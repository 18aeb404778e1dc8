package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

class JobsSpec extends AnyFunSuite {

  test("parseArgs reads key=value pairs and ignores stray tokens") {
    val m = JobSpark.parseArgs(Array("n=100", "ks=1,2,3", "--verbose", "out=/tmp/x"))
    assert(m == Map("n" -> "100", "ks" -> "1,2,3", "out" -> "/tmp/x"))
  }

  test("parseArgs keeps '=' inside values") {
    val m = JobSpark.parseArgs(Array("expr=a=b"))
    assert(m("expr") == "a=b")
  }

  test("emit writes the out file when requested") {
    val tmp = java.nio.file.Files.createTempDirectory("jobs").resolve("sub").resolve("o.txt")
    JobSpark.emit("hello", Map("out" -> tmp.toString))
    assert(java.nio.file.Files.readString(tmp) == "hello")
  }

  test("emit without out only prints") {
    JobSpark.emit("to stdout", Map.empty) // must not throw
  }
}

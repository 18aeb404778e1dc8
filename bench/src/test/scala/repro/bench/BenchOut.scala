package repro.bench

import java.nio.file.{Files, Paths}

/** Bench result sink: everything is printed to stdout (captured in
  * bench_output.txt) and mirrored under bench_results/ for EXPERIMENTS.md.
  */
object BenchOut {
  private val dir = Paths.get(sys.props.getOrElse("bench.out", "bench_results"))

  def write(name: String, text: String): Unit = {
    Files.createDirectories(dir)
    Files.writeString(dir.resolve(name), text)
    println(s"===== $name =====")
    println(text)
  }
}

package repro.estimator

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LinAlgSpec extends AnyFunSuite {

  test("solve recovers the solution of a known system") {
    val a = Array(Array(2.0, 1.0), Array(1.0, 3.0))
    val b = Array(5.0, 10.0)
    val x = LinAlg.solve(a, b)
    assert(math.abs(x(0) - 1.0) < 1e-9 && math.abs(x(1) - 3.0) < 1e-9)
  }

  test("solve handles systems needing pivoting") {
    val a = Array(Array(0.0, 1.0), Array(1.0, 0.0))
    val x = LinAlg.solve(a, Array(2.0, 3.0))
    assert(math.abs(x(0) - 3.0) < 1e-12 && math.abs(x(1) - 2.0) < 1e-12)
  }

  test("solve round-trips random well-conditioned systems") {
    val rnd = new Random(1)
    (1 to 20).foreach { _ =>
      val m = 2 + rnd.nextInt(8)
      val a = Array.fill(m)(Array.fill(m)(rnd.nextDouble() * 2 - 1))
      (0 until m).foreach(i => a(i)(i) += m) // diagonally dominant
      val xTrue = Array.fill(m)(rnd.nextDouble() * 10 - 5)
      val b = Array.tabulate(m)(i => LinAlg.dot(a(i), xTrue))
      val x = LinAlg.solve(a, b)
      x.indices.foreach(i => assert(math.abs(x(i) - xTrue(i)) < 1e-7))
    }
  }

  test("solve rejects singular systems") {
    val a = Array(Array(1.0, 2.0), Array(2.0, 4.0))
    intercept[ArithmeticException](LinAlg.solve(a, Array(1.0, 2.0)))
  }

  test("leastSquares recovers planted linear coefficients") {
    val rnd = new Random(2)
    val beta = Array(3.0, -2.0, 0.5)
    val xs = Array.fill(100)(Array.fill(3)(rnd.nextDouble() * 4 - 2))
    val ys = xs.map(r => LinAlg.dot(r, beta))
    val got = LinAlg.leastSquares(xs, ys)
    got.indices.foreach(i => assert(math.abs(got(i) - beta(i)) < 1e-8))
  }

  test("leastSquares with noise is close to the truth") {
    val rnd = new Random(3)
    val beta = Array(1.5, -0.75)
    val xs = Array.fill(500)(Array.fill(2)(rnd.nextDouble() * 10 - 5))
    val ys = xs.map(r => LinAlg.dot(r, beta) + rnd.nextGaussian() * 0.01)
    val got = LinAlg.leastSquares(xs, ys)
    got.indices.foreach(i => assert(math.abs(got(i) - beta(i)) < 0.01))
  }

  test("ridge shrinks coefficients toward zero") {
    val rnd = new Random(4)
    val xs = Array.fill(50)(Array.fill(2)(rnd.nextDouble()))
    val ys = xs.map(r => 10 * r(0) + 10 * r(1))
    val ols = LinAlg.leastSquares(xs, ys, ridge = 0.0)
    val ridge = LinAlg.leastSquares(xs, ys, ridge = 100.0)
    assert(math.abs(ridge(0)) < math.abs(ols(0)))
  }

  test("rank-deficient design falls back to ridge instead of failing") {
    val xs = Array.fill(10)(Array(1.0, 2.0)) // identical rows, collinear cols
    val ys = Array.fill(10)(5.0)
    val got = LinAlg.leastSquares(xs, ys) // must not throw
    assert(math.abs(LinAlg.dot(Array(1.0, 2.0), got) - 5.0) < 1e-3)
  }

  test("dot computes the inner product") {
    assert(LinAlg.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)) == 32.0)
  }
}

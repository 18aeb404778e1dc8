package repro.estimator

import org.scalatest.funsuite.AnyFunSuite

class GpAdjusterSpec extends AnyFunSuite {

  private val gp = new GpAdjuster(sigma = 50.0)

  test("h is ln(δ+1) on (-1,0] and identity beyond (Eq. 21)") {
    assert(gp.h(0.0) == 0.0)
    assert(gp.h(2.5) == 2.5)
    assert(math.abs(gp.h(-0.5) - math.log(0.5)) < 1e-12)
    intercept[IllegalArgumentException](gp.h(-1.0))
  }

  test("h is continuous at the seam δ=0") {
    assert(math.abs(gp.h(-1e-9) - gp.h(1e-9)) < 1e-6)
  }

  test("kernel is asymmetric: no influence on earlier iterations (Eq. 20)") {
    // iteration 5's runtime cannot affect iteration ≤ 4's correction
    assert(gp.cov(5, 4) == 0.0)
    assert(gp.cov(5, 1) == 0.0)
    assert(gp.cov(5, 6) > 0.0)
    assert(gp.cov(5, 5) == 1.0)
  }

  test("kernel decays with forward distance") {
    val g = new GpAdjuster(sigma = 2.0)
    assert(g.cov(1, 2) > g.cov(1, 5))
    assert(g.cov(1, 5) > g.cov(1, 20))
  }

  test("kernel approaches zero as i' approaches i-1 from above") {
    // h(δ) = ln(δ+1) → −∞ as δ → −1⁺, so cov → 0 (continuity with the 0
    // branch); numerically visible only extremely close to the seam at
    // large σ, so probe at machine-scale offsets.
    assert(gp.cov(5.0, 4.0 + 1e-300) < 1e-6)
    assert(gp.cov(5.0, 4.0 + 1e-300) < gp.cov(5.0, 4.5))
  }

  test("posterior with no observations is the prior mean 1") {
    assert(gp.posterior(Array.empty, Array.empty, Array(1, 2, 3)).forall(_ == 1.0))
  }

  test("posterior tracks a constant observed ratio") {
    // model over-predicts by 2x on every completed iteration
    val post = gp.posterior(Array(1, 2, 3), Array(2.0, 2.0, 2.0), Array(4, 5))
    post.foreach(p => assert(p > 1.5 && p < 2.5, s"posterior=$p"))
  }

  test("adjust keeps observed values and corrects the future") {
    val predicted = Array(10.0, 10.0, 10.0, 10.0, 10.0)
    val observed = Array(5.0, 5.0) // actual half of predicted → g = 2
    val adj = gp.adjust(predicted, observed)
    assert(adj(0) == 5.0 && adj(1) == 5.0)
    (2 until 5).foreach(i => assert(adj(i) < 7.5, s"future slot $i=${adj(i)} not corrected down"))
  }

  test("adjust with no observations returns the prediction unchanged") {
    val p = Array(3.0, 4.0)
    assert(gp.adjust(p, Array.empty).sameElements(p))
  }

  test("underestimation is corrected upward") {
    val predicted = Array(5.0, 5.0, 5.0, 5.0)
    val observed = Array(10.0, 10.0) // g = 0.5 → future should grow
    val adj = gp.adjust(predicted, observed)
    (2 until 4).foreach(i => assert(adj(i) > 7.0, s"slot $i=${adj(i)}"))
  }

  test("a tiny sigma weakens the adjustment (the paper's σ=2 lesson)") {
    val predicted = Array.fill(10)(10.0)
    val observed = Array(5.0, 5.0, 5.0)
    val strong = new GpAdjuster(50.0).adjust(predicted, observed)
    val weak = new GpAdjuster(0.3).adjust(predicted, observed)
    // with a long-range kernel the far future is corrected; with a myopic
    // one it reverts to the unadjusted prediction
    assert(strong(9) < 6.5)
    assert(weak(9) > strong(9))
  }

  test("rejects more observations than predictions") {
    intercept[IllegalArgumentException](gp.adjust(Array(1.0), Array(1.0, 2.0)))
  }
}

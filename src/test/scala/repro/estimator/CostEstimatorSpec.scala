package repro.estimator

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class CostEstimatorSpec extends AnyFunSuite {

  /** Synthetic tasks whose per-iteration runtime follows a known law
    * (≈ c·n·log k /f + first-iteration surcharge) with mild noise — the
    * estimator should learn it accurately.
    */
  private def syntheticSamples(count: Int, q: Int, seed: Long): Array[TaskSample] = {
    val rnd = new Random(seed)
    Array.fill(count) {
      val n = 1000 + rnd.nextInt(50000)
      val k = 10 + rnd.nextInt(500)
      val f = 10 + rnd.nextInt(100)
      val leaves = math.max(1, 2 * n / f)
      val features = TaskFeatures(n.toLong, k, 3, f,
        treeDepth = (math.log(leaves.toDouble) / math.log(2)).toInt + 1,
        leafNodes = leaves, internalNodes = leaves - 1, avgLeafFill = f / 2.0)
      val iters = 3 + rnd.nextInt(q - 2)
      val base = 1e-4 * n * math.log(k + 1.0) / math.sqrt(f.toDouble)
      val runtimes = Array.tabulate(iters) { i =>
        val surcharge = if (i == 0) 1.6 else 1.0
        base * surcharge * (1.0 + 0.02 * rnd.nextGaussian())
      }
      TaskSample(features, runtimes)
    }
  }

  test("fit + predict achieves low WMAPE on the synthetic family") {
    val all = syntheticSamples(300, 10, 1)
    val (train, test) = all.splitAt(240)
    val est = new CostEstimator(q = 10).fit(train)
    val actual = test.map(_.totalMs)
    val preds = test.map(s => est.predictTotalMs(s.features))
    val w = Metrics.wmape(actual, preds)
    assert(w < 0.35, s"wmape=$w")
  }

  test("interaction features beat basic features on this family") {
    val all = syntheticSamples(300, 10, 2)
    val (train, test) = all.splitAt(240)
    val actual = test.map(_.totalMs)
    val inter = new CostEstimator(10, degree = 3, interactions = true).fit(train)
    val basic = new CostEstimator(10, degree = 3, interactions = false).fit(train)
    val wI = Metrics.wmape(actual, test.map(s => inter.predictTotalMs(s.features)))
    val wB = Metrics.wmape(actual, test.map(s => basic.predictTotalMs(s.features)))
    assert(wI <= wB * 1.1, s"interaction=$wI basic=$wB")
  }

  test("memory estimate delegates to Eq. 11") {
    val est = new CostEstimator(5)
    assert(est.estimateMemoryBytes(1000, 10, 3, 30) ==
      MemoryEstimator.daskMeansExtraBytes(1000, 10, 3, 30))
  }

  test("per-iteration predictions are non-negative and length = predicted v") {
    val all = syntheticSamples(100, 8, 3)
    val est = new CostEstimator(8).fit(all)
    all.take(20).foreach { s =>
      val p = est.predictIterRuntimes(s.features)
      assert(p.nonEmpty && p.length <= 8)
      assert(p.forall(_ >= 0.0))
    }
  }

  test("adjustment with a systematic bias improves the estimate") {
    val all = syntheticSamples(200, 10, 4)
    val (train, test) = all.splitAt(160)
    val est = new CostEstimator(10).fit(train)
    // simulate a device that is 2x slower than the training machine
    var adjBetter = 0; var total = 0
    test.foreach { s =>
      val slowed = s.iterRuntimesMs.map(_ * 2.0)
      val actualTotal = slowed.sum
      if (slowed.length > 3) {
        total += 1
        val plain = est.predictTotalMs(s.features)
        val adjusted = est.adjustedTotalMs(s.features, slowed.take(3))
        if (math.abs(adjusted - actualTotal) < math.abs(plain - actualTotal)) adjBetter += 1
      }
    }
    assert(total > 0 && adjBetter.toDouble / total > 0.8, s"adjusted better on $adjBetter/$total")
  }

  test("fully observed task returns the exact observed total") {
    val all = syntheticSamples(50, 6, 5)
    val est = new CostEstimator(6).fit(all)
    val s = all.head
    val obs = Array.fill(6)(7.0)
    assert(est.adjustedTotalMs(s.features, obs) == obs.sum)
  }

  test("fit on an empty sample set is rejected") {
    intercept[IllegalArgumentException](new CostEstimator(5).fit(Array.empty))
  }
}

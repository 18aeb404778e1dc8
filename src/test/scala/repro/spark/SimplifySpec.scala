package repro.spark

import repro.SparkSpec
import repro.core.Vec
import repro.spatial.SpatialData

class SimplifySpec extends SparkSpec {

  test("simplify returns k representatives whose weights sum to n") {
    val df = SpatialData.dataset(spark, "Argo-PC", 2000)
    val out = Simplify.simplify(df, k = 25, maxIters = 5).collect()
    assert(out.length == 25)
    assert(out.map(_.getLong(2)).sum == 2000)
    out.foreach(r => assert(r.getSeq[Double](1).size == 3))
  }

  test("randomSample returns k rows deterministically") {
    val df = SpatialData.dataset(spark, "T-drive", 1000)
    val a = Simplify.randomSample(df, 50).collect().map(_.getLong(0)).sorted
    val b = Simplify.randomSample(df, 50).collect().map(_.getLong(0)).sorted
    assert(a.length == 50 && a.sameElements(b))
  }

  test("k-means representatives cover the data better than random sampling (Fig. 1)") {
    val df = SpatialData.dataset(spark, "Porto", 4000)
    val data = SpatialData.collectPoints(df)
    val k = 60
    val centroids = Simplify.simplify(df, k, maxIters = 8).collect().map(_.getSeq[Double](1).toArray)
    val sampled = Simplify.randomSample(df, k).collect().map(_.getSeq[Double](1).toArray)
    def coverage(reps: Array[Array[Double]]): Double =
      data.map(p => reps.map(r => Vec.dist2(p, r)).min).sum
    val cKm = coverage(centroids)
    val cRand = coverage(sampled)
    assert(cKm < cRand, s"k-means coverage $cKm should beat random $cRand")
  }
}

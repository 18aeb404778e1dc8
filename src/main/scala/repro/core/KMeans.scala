package repro.core

import scala.util.Random

/** Result of one k-means run.
  *
  * @param centroids            final k centroids
  * @param assignments          final per-point cluster id
  * @param iterations           assignment phases executed (≤ maxIters)
  * @param initMs               time spent before the first iteration (index
  *                             construction, bound matrices, …)
  * @param iterMs               wall time of each iteration
  * @param distanceComputations full d-dimensional distance evaluations
  * @param batchPrunedVectors   point-iterations assigned without an
  *                             individual centroid search (paper Table VII
  *                             "pruned vectors")
  * @param extraMemoryFloats    bookkeeping memory beyond the dataset, in
  *                             8-byte slots (indexes, bounds, matrices)
  */
final case class KMeansResult(
    centroids: Array[Array[Double]],
    assignments: Array[Int],
    iterations: Int,
    initMs: Double,
    iterMs: Array[Double],
    distanceComputations: Long,
    batchPrunedVectors: Long,
    extraMemoryFloats: Long,
) {
  def totalMs: Double = initMs + iterMs.sum

  /** Sum of squared errors of this clustering over `data`. */
  def sse(data: Array[Array[Double]]): Double = {
    var s = 0.0; var i = 0
    while (i < data.length) { s += Vec.dist2(data(i), centroids(assignments(i))); i += 1 }
    s
  }
}

/** An exact k-means algorithm: must produce Lloyd's fixed point sequence. */
trait KMeansAlgo {
  def name: String

  /** Extra memory (8-byte slots) this algorithm allocates beyond the dataset
    * — drives the device memory gate that produces the paper's N/A cells.
    */
  def extraMemoryFloats(n: Long, k: Long, d: Long): Long

  /** Run from the given initial centroids (shared across algorithms so runs
    * are comparable and exactness is testable).
    */
  def run(data: Array[Array[Double]], k: Int, maxIters: Int, init: Array[Array[Double]]): KMeansResult
}

object KMeans {

  /** Centroid-drift threshold below which a run is declared converged. */
  val Eps: Double = 1e-12

  /** Deterministic initial centroids: a seeded sample of k distinct points
    * (the paper compares exact accelerators, so all algorithms must share
    * the same start).
    */
  def initCentroids(data: Array[Array[Double]], k: Int, seed: Long): Array[Array[Double]] = {
    require(k >= 1 && k <= data.length, s"need 1 <= k <= n, got k=$k n=${data.length}")
    val rnd = new Random(seed)
    val picked = new java.util.HashSet[Int]()
    val out = new Array[Array[Double]](k)
    var j = 0
    while (j < k) {
      val i = rnd.nextInt(data.length)
      if (picked.add(i)) { out(j) = data(i).clone(); j += 1 }
    }
    out
  }

  /** Standard refinement shared by all algorithms: mean of members, keeping
    * the previous centroid for an emptied cluster. Returns (newCentroids,
    * drifts).
    */
  def refine(
      data: Array[Array[Double]],
      assignments: Array[Int],
      old: Array[Array[Double]],
  ): (Array[Array[Double]], Array[Double]) = {
    val k = old.length; val d = old(0).length
    val sums = Array.fill(k)(new Array[Double](d))
    val counts = new Array[Int](k)
    var i = 0
    while (i < data.length) {
      val a = assignments(i)
      Vec.addInto(sums(a), data(i)); counts(a) += 1
      i += 1
    }
    fromSums(sums, counts, old)
  }

  /** Refinement from pre-aggregated (sum, count) pairs. */
  def fromSums(
      sums: Array[Array[Double]],
      counts: Array[Int],
      old: Array[Array[Double]],
  ): (Array[Array[Double]], Array[Double]) = {
    val k = old.length
    val out = new Array[Array[Double]](k)
    val drifts = new Array[Double](k)
    var j = 0
    while (j < k) {
      out(j) = if (counts(j) > 0) Vec.scale(sums(j), 1.0 / counts(j)) else old(j).clone()
      drifts(j) = Vec.dist(out(j), old(j))
      j += 1
    }
    (out, drifts)
  }

  def maxDrift(drifts: Array[Double]): Double = { var m = 0.0; var j = 0; while (j < drifts.length) { if (drifts(j) > m) m = drifts(j); j += 1 }; m }
}

/** Wall-clock recorder shared by all algorithm implementations. */
final class RunRecorder {
  private var t0 = System.nanoTime()
  private val iters = scala.collection.mutable.ArrayBuffer.empty[Double]
  var initMs: Double = 0.0

  def markInitDone(): Unit = { initMs = (System.nanoTime() - t0) / 1e6; t0 = System.nanoTime() }

  def markIterDone(): Unit = { iters += (System.nanoTime() - t0) / 1e6; t0 = System.nanoTime() }

  def iterMs: Array[Double] = iters.toArray
}

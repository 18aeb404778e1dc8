package repro.estimator

import repro.core.{BallTree, TreeStats}

/** Meta-features describing a k-means task (§V-B): the plain n, k, d, f
  * plus the index-derived features the paper extracts during construction
  * (tree depth, node counts, average leaf fill) which expose how well the
  * spatial vectors assemble in space.
  */
final case class TaskFeatures(
    n: Long,
    k: Int,
    d: Int,
    f: Int,
    treeDepth: Int,
    leafNodes: Int,
    internalNodes: Int,
    avgLeafFill: Double,
) {

  /** Features used by the iteration-count linear regressor. */
  def iterationVector: Array[Double] =
    Array(math.log1p(n.toDouble), math.log1p(k.toDouble), d.toDouble, f.toDouble,
      treeDepth.toDouble, math.log1p(leafNodes.toDouble), avgLeafFill)

  /** Features feeding the per-iteration non-linear regressor; `iter` is the
    * 1-based iteration index. Includes log-scale k (centroid-index search
    * cost grows with log k) and a first-iteration indicator (the first
    * iteration assigns every vector and is systematically slower).
    */
  def runtimeVector(iter: Int): Array[Double] =
    Array(n.toDouble, math.log1p(k.toDouble), f.toDouble, leafNodes.toDouble,
      iter.toDouble, if (iter == 1) 1.0 else 0.0)
}

object TaskFeatures {
  def fromIndex(built: BallTree.Built, n: Long, k: Int, d: Int): TaskFeatures = {
    val s: TreeStats = BallTree.stats(built.root)
    TaskFeatures(n, k, d, built.leafCapacity, s.depth, s.leafNodes, s.internalNodes, s.avgLeafFill)
  }
}

/** One training sample for the runtime predictor: a task's features and
  * its measured per-iteration runtimes.
  */
final case class TaskSample(features: TaskFeatures, iterRuntimesMs: Array[Double]) {
  def totalMs: Double = iterRuntimesMs.sum
  def iterations: Int = iterRuntimesMs.length
}

/** Regression-quality metrics used in Tables VIII / Fig. 11. */
object Metrics {
  def mse(y: Array[Double], yh: Array[Double]): Double =
    y.indices.map(i => { val e = y(i) - yh(i); e * e }).sum / y.length

  def mae(y: Array[Double], yh: Array[Double]): Double =
    y.indices.map(i => math.abs(y(i) - yh(i))).sum / y.length

  /** Weighted absolute mean percentage error Σ|e| / Σ|y|. */
  def wmape(y: Array[Double], yh: Array[Double]): Double =
    y.indices.map(i => math.abs(y(i) - yh(i))).sum / math.max(1e-12, y.map(math.abs).sum)

  /** Symmetric MAPE in percent. */
  def smape(y: Array[Double], yh: Array[Double]): Double =
    100.0 / y.length * y.indices.map { i =>
      val den = (math.abs(y(i)) + math.abs(yh(i))) / 2
      if (den < 1e-12) 0.0 else math.abs(y(i) - yh(i)) / den
    }.sum
}

package repro.core

/** Dense-vector kernels for the k-means algorithms.
  *
  * All spatial vectors are `Array[Double]`; every distance routed through
  * [[DistanceCounter]] so each algorithm can report its pruning power
  * (number of full d-dimensional distance computations) exactly as the
  * paper does.
  */
object Vec {

  /** Euclidean distance ‖a − b‖. */
  def dist(a: Array[Double], b: Array[Double]): Double = math.sqrt(dist2(a, b))

  /** Squared Euclidean distance ‖a − b‖². */
  def dist2(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val t = a(i) - b(i); s += t * t; i += 1 }
    s
  }

  /** In-place a += b. */
  def addInto(a: Array[Double], b: Array[Double]): Unit = {
    var i = 0; while (i < a.length) { a(i) += b(i); i += 1 }
  }

  /** In-place a −= b. */
  def subInto(a: Array[Double], b: Array[Double]): Unit = {
    var i = 0; while (i < a.length) { a(i) -= b(i); i += 1 }
  }

  /** In-place a += s·b. */
  def axpyInto(a: Array[Double], s: Double, b: Array[Double]): Unit = {
    var i = 0; while (i < a.length) { a(i) += s * b(i); i += 1 }
  }

  /** a / s as a fresh array. */
  def scale(a: Array[Double], s: Double): Array[Double] = {
    val out = new Array[Double](a.length)
    var i = 0; while (i < a.length) { out(i) = a(i) * s; i += 1 }
    out
  }

  /** Mean of a non-empty set of vectors. */
  def mean(vs: IndexedSeq[Array[Double]]): Array[Double] = {
    val d = vs.head.length
    val out = new Array[Double](d)
    vs.foreach(v => addInto(out, v))
    scale(out, 1.0 / vs.length)
  }
}

/** Mutable counter threaded through an algorithm run; one per run, never
  * shared across threads.
  */
final class DistanceCounter {
  var count: Long = 0L

  def dist(a: Array[Double], b: Array[Double]): Double = { count += 1; Vec.dist(a, b) }

  def dist2(a: Array[Double], b: Array[Double]): Double = { count += 1; Vec.dist2(a, b) }
}

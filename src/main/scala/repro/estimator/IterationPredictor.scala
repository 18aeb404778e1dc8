package repro.estimator

/** Linear regressor for the iteration count v (§V-B1): predicts how many
  * iterations a task runs before converging (capped at the maximum q) and
  * materialises the dummy selector array u = [1,…,1,0,…,0] of Eq. 13.
  */
final class IterationPredictor(val q: Int) {
  require(q >= 1, "maximum iteration count must be >= 1")

  private var beta: Array[Double] = _

  private def withIntercept(x: Array[Double]): Array[Double] = {
    val out = new Array[Double](x.length + 1)
    out(0) = 1.0
    System.arraycopy(x, 0, out, 1, x.length)
    out
  }

  def fit(features: Array[Array[Double]], iterations: Array[Int]): this.type = {
    require(features.nonEmpty && features.length == iterations.length, "need matching samples")
    val x = features.map(withIntercept)
    beta = LinAlg.leastSquares(x, iterations.map(_.toDouble), ridge = 1e-9)
    this
  }

  /** Predicted iteration count, clamped to [1, q]. */
  def predict(x: Array[Double]): Int = {
    require(beta != null, "fit before predict")
    val v = math.round(LinAlg.dot(withIntercept(x), beta)).toInt
    math.max(1, math.min(q, v))
  }

  /** The dummy array u of Eq. 13 for a predicted count. */
  def dummyArray(v: Int): Array[Double] =
    Array.tabulate(q)(i => if (i < v) 1.0 else 0.0)
}

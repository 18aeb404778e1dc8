package repro.competitors

import repro.estimator.LinAlg

/** The paper's "AutoML" baseline [43] as configured in §VI-A: a regularised
  * linear model (regularisation coefficient 0.1) fit in one pass over
  * max-scaled features with an intercept.
  */
final class RidgeRegressor(val lambda: Double = 0.1) extends RuntimeModel {
  override def name: String = "AutoML"

  private var beta: Array[Double] = _
  private var scales: Array[Double] = _

  private def row(x: Array[Double]): Array[Double] = {
    val out = new Array[Double](x.length + 1)
    out(0) = 1.0
    var i = 0
    while (i < x.length) { out(i + 1) = x(i) / scales(i); i += 1 }
    out
  }

  override def fit(xs: Array[Array[Double]], ys: Array[Double]): this.type = {
    require(xs.nonEmpty && xs.length == ys.length, "need matching samples")
    scales = Array.tabulate(xs(0).length) { i =>
      val m = xs.map(r => math.abs(r(i))).max
      if (m < 1e-12) 1.0 else m
    }
    beta = LinAlg.leastSquares(xs.map(row), ys, ridge = lambda)
    this
  }

  override def predict(x: Array[Double]): Double = LinAlg.dot(row(x), beta)
}

package repro.competitors

import repro.estimator.{IterationPredictor, TaskFeatures, TaskSample}

/** Common interface of the SOTA runtime predictors the paper compares
  * against (Fig. 11): fit on (feature vector → total runtime) pairs,
  * predict a scalar runtime.
  */
trait RuntimeModel {
  def name: String
  def fit(xs: Array[Array[Double]], ys: Array[Double]): this.type
  def predict(x: Array[Double]): Double

  /** Train on whole-task totals (the models' original formulation). */
  def fitTotals(samples: Array[TaskSample]): this.type =
    fit(samples.map(_.features.iterationVector), samples.map(_.totalMs))

  def predictTotal(features: TaskFeatures): Double =
    math.max(0.0, predict(features.iterationVector))
}

/** The paper's "S-" modification: the same base model retrained to predict
  * each iteration's runtime separately (feature vector + iteration index),
  * summed over the iteration count predicted by the shared linear
  * regressor.
  */
final class PerIteration(base: RuntimeModel, q: Int) {
  def name: String = s"S-${base.name}"

  private val iterPredictor = new IterationPredictor(q)

  def fit(samples: Array[TaskSample]): this.type = {
    iterPredictor.fit(samples.map(_.features.iterationVector), samples.map(_.iterations))
    val xs = samples.flatMap(s => s.iterRuntimesMs.indices.map(i => s.features.runtimeVector(i + 1)))
    val ys = samples.flatMap(_.iterRuntimesMs)
    base.fit(xs, ys)
    this
  }

  def predictTotal(features: TaskFeatures): Double = {
    val v = iterPredictor.predict(features.iterationVector)
    (1 to v).map(i => math.max(0.0, base.predict(features.runtimeVector(i)))).sum
  }
}

package repro.spark

import org.apache.spark.ml.clustering.{KMeans => MlKMeans}
import org.apache.spark.ml.functions.array_to_vector
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** MLlib's KMeans as the distributed baseline the per-partition Dask-means
  * operator is compared against.
  */
object MllibLloyd {

  final case class FitResult(centroids: Array[Array[Double]], iterations: Int, trainingCost: Double)

  def fit(df: DataFrame, k: Int, maxIters: Int, seed: Long = 42L): FitResult = {
    val vec = df.select(col("id"), array_to_vector(col("features")).as("fv"))
    val model = new MlKMeans()
      .setK(k)
      .setMaxIter(maxIters)
      .setSeed(seed)
      .setInitMode("random")
      .setFeaturesCol("fv")
      .setTol(0.0)
      .fit(vec)
    FitResult(
      model.clusterCenters.map(_.toArray),
      model.summary.numIter,
      model.summary.trainingCost,
    )
  }
}

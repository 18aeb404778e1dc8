package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The paper's motivating task: simplify a large spatial-vector dataset
  * into k evenly distributed representatives (Fig. 1) — run Dask-means and
  * return the k centroids with their cluster weights.
  */
object Simplify {

  /** Returns `(cluster, features, weight)` with one row per representative.
    * `weight` is the number of original vectors the representative stands
    * for (so downstream learning can resample proportionally).
    */
  def simplify(
      df: DataFrame,
      k: Int,
      maxIters: Int = 20,
      leafCapacity: Int = 30,
      seed: Long = 42L,
  ): DataFrame = {
    val spark = df.sparkSession
    val fitted = DistributedDaskMeans.fit(df, k, maxIters, leafCapacity, seed = seed)
    try {
      val assigned = DistributedDaskMeans.assignments(df, fitted, leafCapacity)
      import spark.implicits._
      val weights = assigned.groupBy("cluster").count().as[(Int, Long)].collect().toMap
      val rows = fitted.centroids.zipWithIndex.map { case (c, j) =>
        (j, c.toSeq, weights.getOrElse(j, 0L))
      }
      spark.createDataFrame(rows.toSeq).toDF("cluster", "features", "weight")
    } finally DistributedDaskMeans.cleanup(fitted)
  }

  /** Random-sampling simplification — the paper's Fig. 1 strawman, used in
    * tests/benches to contrast coverage uniformity.
    */
  def randomSample(df: DataFrame, k: Int, seed: Long = 42L): DataFrame = {
    import org.apache.spark.sql.functions._
    df.orderBy(xxhash64(col("id"), lit(seed))).limit(k).select("id", "features")
  }
}

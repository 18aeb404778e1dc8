package repro.tables

import org.apache.spark.sql.SparkSession
import repro.spatial.SpatialData

/** Table V: pruning power on the high-dimensional embedded-trajectory
  * datasets (128-d / 256-d). Same harness as Table IV at the smaller scale
  * the curse of dimensionality allows.
  */
object TableV {

  def run(
      spark: SparkSession,
      n: Long,
      ks: Seq[Int],
      maxIters: Int,
      gateFloats: Long = AlgoSuite.DefaultGateFloats,
      leafCapacity: Int = 30,
  ): Seq[TableIV.Row] =
    TableIV.run(spark, SpatialData.highDimDatasets, n, ks, maxIters, gateFloats, leafCapacity)

  def render(rows: Seq[TableIV.Row]): String = TableIV.render(rows)
}

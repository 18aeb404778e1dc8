package repro.tables

import org.apache.spark.sql.SparkSession
import repro.spatial.SpatialData

/** Table IV: total runtime of the ten k-means algorithms on the six
  * low-dimensional datasets across k. (Table V is the same harness over
  * the high-dimensional datasets.)
  */
object TableIV {

  final case class Row(dataset: String, k: Int, cells: Seq[AlgoSuite.Cell])

  def run(
      spark: SparkSession,
      datasets: Seq[String],
      n: Long,
      ks: Seq[Int],
      maxIters: Int,
      gateFloats: Long = AlgoSuite.DefaultGateFloats,
      leafCapacity: Int = 30,
  ): Seq[Row] = {
    AlgoSuite.warmUp()
    datasets.flatMap { name =>
      val data = SpatialData.collectPoints(SpatialData.dataset(spark, name, n))
      ks.map { k =>
        // cheap cells (small k) are noise-dominated: measure best-of-2
        val repeats = if (k <= 1000) 2 else 1
        Row(name, k, AlgoSuite.runAll(data, k, maxIters, gateFloats, leafCapacity, repeats = repeats))
      }
    }
  }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= AlgoSuite.header() += '\n'
    rows.foreach { r =>
      sb ++= f"${r.dataset}%-10s ${r.k}%6d " + r.cells.map(AlgoSuite.fmtCell).mkString(" ") += '\n'
    }
    sb.result()
  }
}

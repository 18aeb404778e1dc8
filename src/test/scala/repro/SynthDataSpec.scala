package repro

import org.apache.spark.sql.functions._
import repro.spatial.SpatialData

class SynthDataSpec extends SparkSpec {

  test("lineitem generator aggregates match DuckDB (oracle smoke)") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
      .select("l_quantity", "l_discount").persist()
    val got = li.selectExpr(
      "count(*) AS cnt",
      "round(sum(l_quantity), 2) AS qty",
      "round(avg(l_discount), 4) AS disc",
    )
    Oracle.assertEquivalent(
      got,
      "SELECT count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty, " +
        "round(avg(CAST(l_discount AS DOUBLE)), 4) AS disc FROM lineitem",
      "lineitem" -> li,
    )
    li.unpersist()
  }

  test("orders keys are dense and within customer range") {
    val o = SynthData.orders(spark, sf = 0.001)
    val row = o.agg(min("o_orderkey"), max("o_custkey"), count(lit(1))).head()
    assert(row.getLong(0) == 1L)
    assert(row.getLong(1) <= 150L + 1)
    assert(row.getLong(2) == 1500L)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
    val topZ = z.orderBy(desc("count")).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
    val topU = u.orderBy(desc("count")).head().getLong(1)
    assert(topZ > 4 * topU, s"zipf top=$topZ uniform top=$topU")
  }

  test("spatial delegate reaches the Table-III generators at SF scale") {
    val df = SynthData.spatial(spark, "T-drive", sf = 0.0005)
    assert(df.count() == 500)
    assert(df.select(size(col("features"))).head().getInt(0) == 2)
    val hd = SynthData.spatial(spark, "Apoll-TD", sf = 0.001)
    assert(hd.count() == 500)
    assert(SpatialData.collectPoints(hd).head.length == 128)
  }
}

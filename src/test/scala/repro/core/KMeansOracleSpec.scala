package repro.core

import java.sql.DriverManager
import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.baselines.Lloyd
import repro.spatial.SpatialData

/** DuckDB correctness oracle for the k-means operators: assignment,
  * per-cluster counts and centroid refinement are cross-checked against
  * plain SQL over the same inputs — "it ran" is not "it is correct".
  */
class KMeansOracleSpec extends SparkSpec {

  private def pointsDf(data: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    data.zipWithIndex.map { case (p, i) => (i.toLong, p(0), p(1)) }.toSeq.toDF("pid", "x1", "x2")
  }

  private def centroidsDf(cs: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    cs.zipWithIndex.map { case (c, j) => (j, c(0), c(1)) }.toSeq.toDF("cid", "cx1", "cx2")
  }

  private val bruteAssignSql =
    """SELECT CAST(p.pid AS BIGINT) AS pid,
      |       (SELECT c.cid FROM centroids c
      |        ORDER BY (CAST(p.x1 AS DOUBLE) - CAST(c.cx1 AS DOUBLE)) * (CAST(p.x1 AS DOUBLE) - CAST(c.cx1 AS DOUBLE))
      |               + (CAST(p.x2 AS DOUBLE) - CAST(c.cx2 AS DOUBLE)) * (CAST(p.x2 AS DOUBLE) - CAST(c.cx2 AS DOUBLE)) ASC,
      |                 CAST(c.cid AS INT) ASC
      |        LIMIT 1) AS cluster
      |FROM points p""".stripMargin

  private def fixture(n: Int, k: Int, seed: Long): (Array[Array[Double]], Array[Array[Double]]) = {
    val data = SpatialData.collectPoints(SpatialData.dataset(spark, "T-drive", n, seed)).map(_.take(2))
    (data, KMeans.initCentroids(data, k, seed))
  }

  test("Dask-means assignment phase matches DuckDB brute-force nearest centroid") {
    import spark.implicits._
    val (data, init) = fixture(600, 12, 1)
    val r = new DaskMeans(leafCapacity = 8).run(data, 12, maxIters = 1, init)
    val got = r.assignments.zipWithIndex.map { case (c, i) => (i.toLong, c) }.toSeq.toDF("pid", "cluster")
    Oracle.assertEquivalent(got, bruteAssignSql, "points" -> pointsDf(data), "centroids" -> centroidsDf(init))
  }

  test("Lloyd assignment phase matches DuckDB brute-force nearest centroid") {
    import spark.implicits._
    val (data, init) = fixture(500, 7, 2)
    val r = new Lloyd().run(data, 7, maxIters = 1, init)
    val got = r.assignments.zipWithIndex.map { case (c, i) => (i.toLong, c) }.toSeq.toDF("pid", "cluster")
    Oracle.assertEquivalent(got, bruteAssignSql, "points" -> pointsDf(data), "centroids" -> centroidsDf(init))
  }

  test("per-cluster counts match DuckDB") {
    import spark.implicits._
    val (data, init) = fixture(800, 9, 3)
    val r = new DaskMeans().run(data, 9, maxIters = 1, init)
    val got = r.assignments.groupBy(identity).map { case (c, xs) => (c, xs.length.toLong) }
      .toSeq.toDF("cluster", "cnt")
    val sql =
      s"""SELECT CAST(cluster AS INT) AS cluster, count(*) AS cnt FROM (
         |  $bruteAssignSql
         |) GROUP BY cluster""".stripMargin
    Oracle.assertEquivalent(got, sql, "points" -> pointsDf(data), "centroids" -> centroidsDf(init))
  }

  test("centroid refinement matches DuckDB averages") {
    import spark.implicits._
    val (data, init) = fixture(700, 6, 4)
    val r = new DaskMeans().run(data, 6, maxIters = 1, init)
    // clusters that kept no point retain the initial centroid; DuckDB sees
    // only non-empty ones, so emit ours for non-empty clusters only
    val nonEmpty = r.assignments.toSet
    val got = r.centroids.zipWithIndex
      .filter { case (_, j) => nonEmpty(j) }
      .map { case (c, j) => (j, c(0), c(1)) }
      .toSeq.toDF("cluster", "mx1", "mx2")
    val sql =
      s"""SELECT CAST(cluster AS INT) AS cluster,
         |       avg(CAST(x1 AS DOUBLE)) AS mx1,
         |       avg(CAST(x2 AS DOUBLE)) AS mx2
         |FROM (
         |  SELECT p.*, a.cluster FROM points p JOIN ($bruteAssignSql) a ON CAST(p.pid AS BIGINT) = a.pid
         |) GROUP BY cluster""".stripMargin
    Oracle.assertEquivalent(got, sql, "points" -> pointsDf(data), "centroids" -> centroidsDf(init))
  }

  test("SSE after one iteration matches DuckDB within tolerance") {
    val (data, init) = fixture(500, 8, 5)
    val r = new DaskMeans().run(data, 8, maxIters = 1, init)
    // DuckDB: sum over points of squared distance to our refined centroid
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    try {
      val st = conn.createStatement()
      st.execute("CREATE TABLE points (pid BIGINT, x1 DOUBLE, x2 DOUBLE, cluster INT)")
      val ps = conn.prepareStatement("INSERT INTO points VALUES (?,?,?,?)")
      data.indices.foreach { i =>
        ps.setLong(1, i.toLong); ps.setDouble(2, data(i)(0)); ps.setDouble(3, data(i)(1))
        ps.setInt(4, r.assignments(i)); ps.addBatch()
      }
      ps.executeBatch(); ps.close()
      st.execute("CREATE TABLE cents (cid INT, x1 DOUBLE, x2 DOUBLE)")
      val pc = conn.prepareStatement("INSERT INTO cents VALUES (?,?,?)")
      r.centroids.zipWithIndex.foreach { case (c, j) =>
        pc.setInt(1, j); pc.setDouble(2, c(0)); pc.setDouble(3, c(1)); pc.addBatch()
      }
      pc.executeBatch(); pc.close()
      val rs = st.executeQuery(
        """SELECT sum((p.x1-c.x1)*(p.x1-c.x1) + (p.x2-c.x2)*(p.x2-c.x2))
          |FROM points p JOIN cents c ON p.cluster = c.cid""".stripMargin)
      rs.next()
      val duck = rs.getDouble(1)
      val ours = r.sse(data)
      assert(math.abs(duck - ours) / math.max(1.0, duck) < 1e-9, s"$ours vs $duck")
    } finally conn.close()
  }

  test("generator aggregates match DuckDB over the same rows") {
    val data = SpatialData.collectPoints(SpatialData.dataset(spark, "Porto", 400))
    val df = pointsDf(data.map(_.take(2)))
    val got = df.selectExpr(
      "count(*) AS cnt",
      "round(min(x1), 4) AS mn",
      "round(max(x1), 4) AS mx",
    )
    Oracle.assertEquivalent(
      got,
      "SELECT count(*) AS cnt, round(min(CAST(x1 AS DOUBLE)), 4) AS mn, round(max(CAST(x1 AS DOUBLE)), 4) AS mx FROM points",
      "points" -> df,
    )
  }
}

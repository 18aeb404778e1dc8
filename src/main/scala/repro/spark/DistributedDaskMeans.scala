package repro.spark

import org.apache.spark.TaskContext
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._

import repro.core._

import scala.collection.concurrent.TrieMap

/** Executor-local cache of per-partition Ball-trees and assignment state.
  *
  * The tree over a partition's spatial vectors is built once (the paper
  * builds the spatial-vector index once per task) and reused across the
  * driver-coordinated iterations; the assignment markers persist so the
  * inter-bound / batch pruning carries over between iterations exactly as
  * in the serial algorithm. Keys are (runId, partitionId); entries are
  * dropped explicitly when a run finishes. Works wherever executor JVMs
  * are stable across stages (local mode and standalone executors).
  */
object PartitionIndexCache {
  final class Entry(
      val ids: Array[Long],
      val state: TreeAssignmentState,
      val counter: DistanceCounter,
  )

  private val cache = TrieMap.empty[(String, Int), Entry]

  def getOrBuild(runId: String, partition: Int, build: () => Entry): Entry =
    cache.getOrElseUpdate((runId, partition), build())

  def get(runId: String, partition: Int): Option[Entry] = cache.get((runId, partition))

  def drop(runId: String): Unit =
    cache.keys.filter(_._1 == runId).foreach(cache.remove)

  def size: Int = cache.size
}

/** Dask-means lifted onto Spark per the repro plan: the memory-tunable
  * index and batch assignment run as a per-partition `mapPartitions`
  * operator, feeding MLlib-KMeans-style (Lloyd) iterations — per iteration
  * the driver broadcasts the centroids and inter bounds, each partition
  * runs [[repro.core.DaskAssign.step]] over its cached tree, and the
  * emitted (cluster, count, sum) partials are reduced into the next
  * centroids.
  */
object DistributedDaskMeans {

  final case class FitResult(
      centroids: Array[Array[Double]],
      iterations: Int,
      runId: String,
      batchPrunedVectors: Long,
  )

  /** Deterministic initial centroids: the k rows with the smallest hashed
    * ids (a seeded pseudo-random sample).
    */
  def initialCentroids(df: DataFrame, k: Int, seed: Long): Array[Array[Double]] =
    df.orderBy(xxhash64(col("id"), lit(seed)))
      .limit(k)
      .select("features")
      .collect()
      .map(_.getSeq[Double](0).toArray)

  /** Fit k-means over `df` (columns `id`, `features`). The frame should be
    * persisted by the caller if it is expensive to recompute; partitions
    * must be deterministic across iterations (repartition(id) enforces it).
    */
  def fit(
      df: DataFrame,
      k: Int,
      maxIters: Int,
      leafCapacity: Int = 30,
      numPartitions: Int = 0,
      seed: Long = 42L,
      init: Option[Array[Array[Double]]] = None,
  ): FitResult = {
    val spark = df.sparkSession
    val parts = if (numPartitions > 0) numPartitions else spark.sparkContext.defaultParallelism
    val pts = df.select("id", "features").repartition(parts, col("id")).persist()
    pts.count() // materialise so the partition layout is frozen

    val runId = java.util.UUID.randomUUID().toString
    var centroids = init.map(_.map(_.clone())).getOrElse(initialCentroids(pts, k, seed))
    require(centroids.length == k, s"need k=$k distinct initial centroids, got ${centroids.length}")
    val d = centroids(0).length
    var cb: Array[Double] = new Array[Double](k)
    val drifts = new Array[Double](k)
    val driverCounter = new DistanceCounter
    var it = 0
    var converged = false
    var pruned = 0L

    while (it < maxIters && !converged) {
      // Driver-side inter bounds over a centroid index (k is small).
      val index = if (k > 1) new CentroidIndex(centroids, leafCapacity, driverCounter) else null
      cb = DaskAssign.interBounds(centroids, index, first = it == 0, cb, drifts, driverCounter)
      val bc = spark.sparkContext.broadcast((centroids, cb))

      // Per-partition batch assignment over the cached trees.
      import spark.implicits._
      val partials: Array[(Int, Long, Array[Double], Long)] = pts
        .mapPartitions { rows =>
          val pid = TaskContext.getPartitionId()
          val entry = PartitionIndexCache.getOrBuild(runId, pid, () => {
            val buf = rows.map(r => (r.getLong(0), r.getSeq[Double](1).toArray)).toArray
            val data = buf.map(_._2)
            val counter = new DistanceCounter
            if (data.isEmpty) new PartitionIndexCache.Entry(Array.empty, null, counter)
            else new PartitionIndexCache.Entry(
              buf.map(_._1),
              new TreeAssignmentState(data, BallTree.build(data, leafCapacity), k),
              counter)
          })
          if (entry.state == null) Iterator.empty
          else {
            val (cs, cbLocal) = bc.value
            val localIndex = if (k > 1) new CentroidIndex(cs, leafCapacity, entry.counter) else null
            val prunedHere = DaskAssign.step(entry.state, cs, cbLocal, localIndex, entry.counter)
            (0 until k).iterator
              .filter(j => entry.state.counts(j) > 0)
              .map(j => (j, entry.state.counts(j).toLong, entry.state.sums(j), if (j == 0) prunedHere else 0L))
          }
        }
        .collect()

      // Reduce partials into new centroids.
      val sums = Array.fill(k)(new Array[Double](d))
      val counts = new Array[Long](k)
      partials.foreach { case (j, c, s, pr) =>
        counts(j) += c
        Vec.addInto(sums(j), s)
        pruned += pr
      }
      var j = 0
      val next = new Array[Array[Double]](k)
      while (j < k) {
        next(j) = if (counts(j) > 0) Vec.scale(sums(j), 1.0 / counts(j)) else centroids(j)
        drifts(j) = Vec.dist(next(j), centroids(j))
        j += 1
      }
      centroids = next
      it += 1
      converged = KMeans.maxDrift(drifts) <= KMeans.Eps
      bc.unpersist()
    }

    pts.unpersist()
    FitResult(centroids, it, runId, pruned)
  }

  /** Final per-point assignments of a finished run as a DataFrame
    * `(id, cluster)`; requires the run's cached partition state (call
    * before [[cleanup]]). Falls back to a broadcast nearest-centroid pass
    * for partitions whose cache entry is gone.
    */
  def assignments(df: DataFrame, fitted: FitResult, leafCapacity: Int = 30, numPartitions: Int = 0): DataFrame = {
    val spark = df.sparkSession
    val parts = if (numPartitions > 0) numPartitions else spark.sparkContext.defaultParallelism
    val bc = spark.sparkContext.broadcast(fitted.centroids)
    import spark.implicits._
    df.select("id", "features")
      .repartition(parts, col("id"))
      .mapPartitions { rows =>
        val pid = TaskContext.getPartitionId()
        PartitionIndexCache.get(fitted.runId, pid) match {
          case Some(entry) if entry.state != null =>
            val a = entry.state.materialize()
            val byId = new java.util.HashMap[Long, Int](entry.ids.length * 2)
            entry.ids.indices.foreach(i => byId.put(entry.ids(i), i))
            rows.map { r =>
              val id = r.getLong(0)
              val i = byId.getOrDefault(id, -1)
              if (i >= 0) (id, a(i))
              else {
                val p = r.getSeq[Double](1).toArray
                (id, nearestOf(p, bc.value))
              }
            }
          case _ =>
            rows.map { r =>
              val p = r.getSeq[Double](1).toArray
              (r.getLong(0), nearestOf(p, bc.value))
            }
        }
      }
      .toDF("id", "cluster")
  }

  private def nearestOf(p: Array[Double], cs: Array[Array[Double]]): Int = {
    var best = 0; var bd = Double.PositiveInfinity
    var j = 0
    while (j < cs.length) { val t = Vec.dist2(p, cs(j)); if (t < bd) { bd = t; best = j }; j += 1 }
    best
  }

  def cleanup(fitted: FitResult): Unit = PartitionIndexCache.drop(fitted.runId)

  /** Sum of squared errors of a fitted model over the frame. */
  def sse(df: DataFrame, centroids: Array[Array[Double]]): Double = {
    val spark = df.sparkSession
    val bc = spark.sparkContext.broadcast(centroids)
    import spark.implicits._
    df.select("features")
      .map { r =>
        val p = r.getSeq[Double](0).toArray
        val cs = bc.value
        var bd = Double.PositiveInfinity
        var j = 0
        while (j < cs.length) { val t = Vec.dist2(p, cs(j)); if (t < bd) bd = t; j += 1 }
        bd
      }
      .reduce(_ + _)
  }
}

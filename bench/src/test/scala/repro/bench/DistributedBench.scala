package repro.bench

import repro.SparkSpec
import repro.spark.{DistributedDaskMeans, MllibLloyd}
import repro.spatial.SpatialData

/** The Spark-lift sanity bench: the per-partition Dask-means operator vs
  * MLlib KMeans on the same data (the paper's future-work direction,
  * realised here per the repro plan).
  */
class DistributedBench extends SparkSpec {

  test("distributed Dask-means vs MLlib KMeans at n=200k, k=500") {
    val df = SpatialData.dataset(spark, "Argo-PC", 200_000L).persist()
    df.count()

    val t0 = System.nanoTime()
    val fitted = DistributedDaskMeans.fit(df, 500, maxIters = 10, numPartitions = 8)
    val daskSec = (System.nanoTime() - t0) / 1e9
    val daskSse = DistributedDaskMeans.sse(df, fitted.centroids)
    DistributedDaskMeans.cleanup(fitted)

    val t1 = System.nanoTime()
    val ml = MllibLloyd.fit(df, 500, maxIters = 10)
    val mlSec = (System.nanoTime() - t1) / 1e9

    val text =
      f"""n=200000 k=500 maxIters=10
         |distributed Dask-means: ${daskSec}%8.2f s  iters=${fitted.iterations}  SSE=${daskSse}%14.1f  pruned=${fitted.batchPrunedVectors}
         |MLlib KMeans (Lloyd)  : ${mlSec}%8.2f s  iters=${ml.iterations}  SSE=${ml.trainingCost}%14.1f
         |""".stripMargin
    BenchOut.write("distributed.txt", text)

    df.unpersist()
    assert(daskSse > 0 && ml.trainingCost > 0)
    // same objective, different inits: solutions must be the same order
    assert(daskSse < ml.trainingCost * 3 && ml.trainingCost < daskSse * 3)
  }
}

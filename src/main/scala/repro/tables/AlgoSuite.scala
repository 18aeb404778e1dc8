package repro.tables

import repro.baselines._
import repro.core._

/** The ten-algorithm lineup of Tables IV/V in the paper's column order,
  * plus the device memory gate that produces the N/A cells.
  */
object AlgoSuite {

  /** Paper column order: Lloyd, NoBound, Dual-tree, Hamerly, Drake,
    * Yinyang, Elkan, NoInB, NokNN, Dask-means.
    */
  def algorithms(leafCapacity: Int = 30): Seq[KMeansAlgo] = Seq(
    new Lloyd,
    new NoBound,
    new DualTree(leafCapacity = 8),
    new Hamerly,
    new Drake,
    new Yinyang,
    new Elkan,
    new DaskMeans(useKnn = true, useInterBound = false, leafCapacity = leafCapacity),  // NoInB
    new DaskMeans(useKnn = false, useInterBound = true, leafCapacity = leafCapacity),  // NokNN
    new DaskMeans(useKnn = true, useInterBound = true, leafCapacity = leafCapacity),   // Dask-means
  )

  /** Default device memory gate in float slots (≈1.6 GB): the scaled stand-
    * in for the paper's resource-constrained device — Elkan's n·k bounds
    * and Drake's n·k/4 candidate lists blow through it at large k exactly
    * as in the paper's N/A cells.
    */
  val DefaultGateFloats: Long = 200_000_000L

  final case class Cell(
      algorithm: String,
      runtimeSec: Option[Double],
      initSec: Double,
      iterations: Int,
      distances: Long,
      sse: Double,
      memoryFloats: Long,
  )

  /** Run every algorithm on one (data, k) setting from a shared init; a
    * `None` runtime is an N/A produced by the memory gate. Also
    * cross-checks that all completed algorithms converged to the same SSE
    * (they are exact accelerations of Lloyd).
    */
  def runAll(
      data: Array[Array[Double]],
      k: Int,
      maxIters: Int,
      gateFloats: Long = DefaultGateFloats,
      leafCapacity: Int = 30,
      seed: Long = 17L,
      verifyExactness: Boolean = true,
      repeats: Int = 1,
  ): Seq[Cell] = {
    val n = data.length.toLong
    val d = data(0).length.toLong
    val init = KMeans.initCentroids(data, k, seed)
    val cells = algorithms(leafCapacity).map { algo =>
      val mem = algo.extraMemoryFloats(n, k.toLong, d)
      if (mem > gateFloats)
        Cell(algo.name, None, 0.0, 0, 0L, Double.NaN, mem)
      else {
        // best-of-`repeats`: the runs are deterministic and identical in
        // work (same distance counts), so the minimum strips JIT/GC and
        // scheduler noise from the container
        val runs = (1 to math.max(1, repeats)).map(_ => algo.run(data, k, maxIters, init))
        val r = runs.minBy(_.totalMs)
        Cell(algo.name, Some(r.totalMs / 1000.0), r.initMs / 1000.0, r.iterations,
          r.distanceComputations, r.sse(data), mem)
      }
    }
    if (verifyExactness) {
      val done = cells.filter(_.runtimeSec.isDefined)
      val ref = done.head.sse
      done.foreach { c =>
        require(
          math.abs(c.sse - ref) <= 1e-6 * math.max(1.0, math.abs(ref)),
          s"${c.algorithm} SSE ${c.sse} deviates from Lloyd's $ref — exactness violated",
        )
      }
    }
    cells
  }

  /** A small warm-up so the first timed dataset does not pay JIT cost. */
  def warmUp(): Unit = {
    val rnd = new scala.util.Random(5)
    val data = Array.fill(2000)(Array.fill(3)(rnd.nextDouble() * 10))
    runAll(data, 16, maxIters = 3, verifyExactness = false)
    ()
  }

  def fmtCell(c: Cell): String = c.runtimeSec.map(s => f"$s%9.2f").getOrElse("      N/A")

  def header(): String =
    f"${"dataset"}%-10s ${"k"}%6s " + algorithms().map(a => f"${a.name}%10s").mkString(" ")
}

package repro.core

import repro.estimator.MemoryEstimator

/** The paper's memory-efficient accelerator (§IV, Algorithm 1).
  *
  * A Ball-tree is built once over the spatial vectors and another over the
  * centroids every iteration. Assignment recursively traverses the point
  * tree:
  *
  *  - Eq. 5: a wholly-assigned node stays in its cluster when
  *    ‖N.p* − c_a(N)‖ + N.r < cb[a(N)]/2 (inter bound);
  *  - Eq. 6: otherwise a 2-NN search over the centroid index (with the
  *    upper bound inherited from the parent node, Eq. 7/8) batch-assigns the
  *    node when d2 − d1 > 2·N.r;
  *  - Eq. 4: a point stays when ‖p − c_a(i)‖ < cb[a(i)]/2, else a bounded
  *    1-NN search assigns it.
  *
  * Inter bounds cb[j] are computed with a 2-NN search seeded by the
  * drift-based upper bound of Eq. 9. Cluster means are maintained as dynamic
  * sum vectors; whole nodes move between clusters in O(d). The per-pass
  * machinery lives in [[DaskAssign]] so the Spark layer can run the same
  * step per partition.
  *
  * @param useKnn        false ⇒ the NokNN ablation: centroid searches scan
  *                      all k centroids linearly (no centroid index)
  * @param useInterBound false ⇒ the NoInB ablation: Eq. 4/5 checks and
  *                      cb[·] maintenance are disabled
  * @param leafCapacity  the paper's f for both trees (memory-tunable, Eq. 12)
  * @param prebuilt      a cached point index (built once per dataset; reused
  *                      across runs and by the Spark layer)
  */
final class DaskMeans(
    val useKnn: Boolean = true,
    val useInterBound: Boolean = true,
    val leafCapacity: Int = 30,
    prebuilt: Option[BallTree.Built] = None,
) extends KMeansAlgo {

  override def name: String =
    if (useKnn && useInterBound) "Dask-means"
    else if (useKnn) "NoInB"
    else if (useInterBound) "NokNN"
    else "IndexOnly"

  override def extraMemoryFloats(n: Long, k: Long, d: Long): Long =
    MemoryEstimator.daskMeansExtraFloats(n, k, d, leafCapacity)

  override def run(
      data: Array[Array[Double]],
      k: Int,
      maxIters: Int,
      init: Array[Array[Double]],
  ): KMeansResult = {
    require(maxIters >= 1, "need at least one iteration")
    val rec = new RunRecorder
    val counter = new DistanceCounter
    var pruned = 0L

    val tree = prebuilt.getOrElse(BallTree.build(data, leafCapacity))
    val state = new TreeAssignmentState(data, tree, k)
    rec.markInitDone()

    var centroids = init.map(_.clone())
    var cb: Array[Double] = new Array[Double](k)
    val drifts = new Array[Double](k)
    var it = 0
    var converged = false

    while (it < maxIters && !converged) {
      val index: CentroidIndex =
        if (useKnn && k > 1) new CentroidIndex(centroids, leafCapacity, counter) else null
      if (useInterBound)
        cb = DaskAssign.interBounds(centroids, index, first = it == 0, cb, drifts, counter)
      pruned += DaskAssign.step(state, centroids, if (useInterBound) cb else null, index, counter)
      centroids = state.refine(centroids, drifts)
      it += 1
      converged = KMeans.maxDrift(drifts) <= KMeans.Eps
      rec.markIterDone()
    }

    KMeansResult(
      centroids = centroids,
      assignments = state.materialize(),
      iterations = it,
      initMs = rec.initMs,
      iterMs = rec.iterMs,
      distanceComputations = counter.count,
      batchPrunedVectors = pruned,
      extraMemoryFloats = extraMemoryFloats(data.length.toLong, k.toLong, data(0).length.toLong),
    )
  }
}

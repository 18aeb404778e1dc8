package repro.baselines

import repro.core._
import repro.estimator.MemoryEstimator

/** Dual-tree k-means [50] (Curtin-style, simplified): Hamerly's single
  * upper/lower bound lifted onto a Ball-tree over the points, with bounds
  * maintained for *both* nodes and points across iterations (adjusted by
  * centroid drifts), and whole nodes assigned in batch. Unlike Dask-means
  * it has no centroid index: a node that fails its bound check scans all k
  * centroids — the O(k) behaviour the paper criticises at large k.
  *
  * Simplification vs [50]: centroid grouping for batch centroid pruning is
  * omitted (the node/point bound structure, batch assignment, and
  * memory profile — two bounds per node and per point — are preserved).
  */
final class DualTree(val leafCapacity: Int = 8) extends KMeansAlgo {
  override def name: String = "Dual-tree"

  override def extraMemoryFloats(n: Long, k: Long, d: Long): Long =
    MemoryEstimator.indexFloats(n, leafCapacity.toLong, d) + 3L * (4 * n / leafCapacity) + 4L * n

  override def run(
      data: Array[Array[Double]],
      k: Int,
      maxIters: Int,
      init: Array[Array[Double]],
  ): KMeansResult = {
    require(maxIters >= 1, "need at least one iteration")
    val n = data.length
    val rec = new RunRecorder
    val counter = new DistanceCounter
    var pruned = 0L

    val tree = BallTree.build(data, leafCapacity)
    val state = new TreeAssignmentState(data, tree, k)
    val nodeUb = new Array[Double](tree.nodeCount)
    val nodeLb = new Array[Double](tree.nodeCount)
    val nodeVer = new Array[Int](tree.nodeCount)
    val u = new Array[Double](n)
    val l = new Array[Double](n)
    val pVer = new Array[Int](n)
    rec.markInitDone()

    var centroids = init.map(_.clone())
    val drifts = new Array[Double](k)
    // cumulative drift per centroid by version; version v = centroids after
    // v refinements, cum(v)(j) = Σ_{τ≤v} δ_τ(j)
    val cum = scala.collection.mutable.ArrayBuffer(new Array[Double](k))
    val cumMax = scala.collection.mutable.ArrayBuffer(0.0)

    var it = 0
    var converged = false

    while (it < maxIters && !converged) {
      val now = it // current centroid version

      def adjUb(ub: Double, c: Int, ver: Int): Double = ub + (cum(now)(c) - cum(ver)(c))
      def adjLb(lb: Double, ver: Int): Double = lb - (cumMax(now) - cumMax(ver))

      /** Scan all k centroids from q. Returns (j1, d1, d2, dAssigned,
        * lbExcludingAssigned) where `assigned` may be −1.
        */
      def scanAll(q: Array[Double], assigned: Int): (Int, Double, Double, Double, Double) = {
        var j1 = -1; var d1 = Double.PositiveInfinity; var d2 = Double.PositiveInfinity
        var dA = Double.PositiveInfinity
        var minExcl = Double.PositiveInfinity
        var j = 0
        while (j < k) {
          val t = counter.dist(q, centroids(j))
          if (j == assigned) dA = t
          else if (t < minExcl) minExcl = t
          if (t < d1) { d2 = d1; d1 = t; j1 = j }
          else if (t < d2) d2 = t
          j += 1
        }
        (j1, d1, d2, dA, minExcl)
      }

      def visitLeafPoint(p: Int, node: BallNode): Unit = {
        val a0 = state.assignments(p)
        if (a0 >= 0) {
          u(p) = adjUb(u(p), a0, pVer(p)); l(p) = adjLb(l(p), pVer(p)); pVer(p) = now
          if (u(p) <= l(p)) { pruned += 1; return }
          u(p) = counter.dist(data(p), centroids(a0)) // tighten
          if (u(p) <= l(p)) { pruned += 1; return }
        }
        val (j1, d1, d2, _, _) = scanAll(data(p), -1)
        state.assignPoint(p, j1)
        u(p) = d1; l(p) = d2; pVer(p) = now
      }

      def visit(node: BallNode): Unit = {
        val id = node.id
        if (node.wholly && node.assignedCluster >= 0) {
          val c = node.assignedCluster
          nodeUb(id) = adjUb(nodeUb(id), c, nodeVer(id))
          nodeLb(id) = adjLb(nodeLb(id), nodeVer(id))
          nodeVer(id) = now
          if (nodeUb(id) + node.radius < nodeLb(id) - node.radius) {
            pruned += node.count
            return // whole node keeps its assignment
          }
        }
        val (j1, d1, d2, dA, lbExcl) = scanAll(node.pivot, if (node.wholly) node.assignedCluster else -1)
        if (d2 - d1 > 2 * node.radius) {
          state.batchAssign(node, j1)
          nodeUb(id) = d1; nodeLb(id) = d2; nodeVer(id) = now
          pruned += node.count
          return
        }
        if (node.wholly && node.assignedCluster >= 0) {
          // keep the marker's bounds fresh for the push-down below
          nodeUb(id) = dA; nodeLb(id) = lbExcl; nodeVer(id) = now
        }
        if (node.isLeaf) {
          state.pushDown(node)(onPoint = p => {
            u(p) = nodeUb(id) + node.radius
            l(p) = nodeLb(id) - node.radius
            pVer(p) = now
          })
          var i = 0
          while (i < node.points.length) { visitLeafPoint(node.points(i), node); i += 1 }
        } else {
          state.pushDown(node)(onChild = ch => {
            nodeUb(ch.id) = nodeUb(id) + node.radius
            nodeLb(ch.id) = nodeLb(id) - node.radius
            nodeVer(ch.id) = now
          })
          visit(node.left)
          visit(node.right)
        }
      }

      if (k == 1) { state.batchAssign(tree.root, 0); pruned += n }
      else visit(tree.root)

      centroids = state.refine(centroids, drifts)
      val nextCum = new Array[Double](k)
      var j = 0
      while (j < k) { nextCum(j) = cum(now)(j) + drifts(j); j += 1 }
      cum += nextCum
      cumMax += (cumMax(now) + KMeans.maxDrift(drifts))
      it += 1
      converged = KMeans.maxDrift(drifts) <= KMeans.Eps
      rec.markIterDone()
    }

    KMeansResult(centroids, state.materialize(), it, rec.initMs, rec.iterMs, counter.count, pruned,
      extraMemoryFloats(n.toLong, k.toLong, data(0).length.toLong))
  }
}

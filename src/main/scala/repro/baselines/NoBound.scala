package repro.baselines

import repro.core._

/** NoBound [64] (Xia et al., "ball k-means"): no per-point bounds. Each
  * cluster is a ball with radius max_{x∈S_j} ‖x − c_j‖; a point can only
  * move to a *neighbour* cluster (within 2·r_j of c_j, found from the k×k
  * centroid distance matrix recomputed every iteration), and points inside
  * the stable area (closer than half the distance to the nearest neighbour
  * centroid) are not compared at all. The first iteration is a full Lloyd
  * assignment — the expensive initialisation the paper observes.
  */
final class NoBound extends KMeansAlgo {
  override def name: String = "NoBound"

  override def extraMemoryFloats(n: Long, k: Long, d: Long): Long = k * k + n + 2 * k

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

    var centroids = init.map(_.clone())
    val a = new Array[Int](n)
    val dToOwn = new Array[Double](n) // ‖x − c_a(x)‖ under current centroids
    val radius = new Array[Double](k)
    val cc = Array.ofDim[Double](k, k)
    val drifts = new Array[Double](k)
    rec.markInitDone()

    var it = 0
    var converged = false

    while (it < maxIters && !converged) {
      if (it == 0) {
        // Full assignment (the costly init the paper reports).
        var i = 0
        while (i < n) {
          var best = -1; var bestD = Double.PositiveInfinity
          var j = 0
          while (j < k) {
            val t = counter.dist(data(i), centroids(j))
            if (t < bestD) { bestD = t; best = j }
            j += 1
          }
          a(i) = best; dToOwn(i) = bestD
          i += 1
        }
      } else {
        // k×k centroid distance matrix (the algorithm's signature cost).
        var j = 0
        while (j < k) {
          var j2 = j + 1
          while (j2 < k) {
            val t = counter.dist(centroids(j), centroids(j2))
            cc(j)(j2) = t; cc(j2)(j) = t
            j2 += 1
          }
          cc(j)(j) = 0.0
          j += 1
        }
        // Cluster radii from the members' distances to their own centroid.
        java.util.Arrays.fill(radius, 0.0)
        var i = 0
        while (i < n) {
          val c = a(i)
          dToOwn(i) = counter.dist(data(i), centroids(c))
          if (dToOwn(i) > radius(c)) radius(c) = dToOwn(i)
          i += 1
        }
        // Neighbour sets: only clusters within 2·r_j can steal points of j.
        val neighbours = Array.tabulate(k) { c =>
          val buf = scala.collection.mutable.ArrayBuffer.empty[Int]
          var j2 = 0
          while (j2 < k) { if (j2 != c && cc(c)(j2) < 2 * radius(c)) buf += j2; j2 += 1 }
          buf.toArray
        }
        val halfNearest = Array.tabulate(k) { c =>
          var m = Double.PositiveInfinity
          neighbours(c).foreach(j2 => if (cc(c)(j2) < m) m = cc(c)(j2))
          m / 2
        }
        i = 0
        while (i < n) {
          val c = a(i)
          if (dToOwn(i) > halfNearest(c)) { // outside the stable area
            var best = c; var bestD = dToOwn(i)
            val ns = neighbours(c)
            var x = 0
            while (x < ns.length) {
              val j2 = ns(x)
              // a neighbour can only win if its half-plane boundary is crossed
              if (cc(c)(j2) / 2 < dToOwn(i)) {
                val t = counter.dist(data(i), centroids(j2))
                if (t < bestD) { bestD = t; best = j2 }
              }
              x += 1
            }
            if (best != c) { a(i) = best; dToOwn(i) = bestD }
          }
          i += 1
        }
      }

      val (next, _) = KMeans.refine(data, a, centroids)
      var maxDrift = 0.0
      var j = 0
      while (j < k) {
        drifts(j) = Vec.dist(next(j), centroids(j))
        if (drifts(j) > maxDrift) maxDrift = drifts(j)
        j += 1
      }
      centroids = next
      it += 1
      converged = maxDrift <= KMeans.Eps
      rec.markIterDone()
    }

    KMeansResult(centroids, a, it, rec.initMs, rec.iterMs, counter.count, 0L,
      extraMemoryFloats(n.toLong, k.toLong, data(0).length.toLong))
  }
}

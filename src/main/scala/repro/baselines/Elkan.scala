package repro.baselines

import repro.core._

/** Elkan's algorithm [21] (scikit-learn's default): n×k lower bounds
  * l(i,j), an upper bound u(i) per point, and the k×k inter-centroid
  * half-distances. Exact, fast at small k, memory-prohibitive at large k
  * (the paper's N/A cells).
  */
final class Elkan extends KMeansAlgo {
  override def name: String = "Elkan"

  override def extraMemoryFloats(n: Long, k: Long, d: Long): Long = n * k + n + k * k

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
    val u = new Array[Double](n)
    val l = Array.ofDim[Double](n, k)
    val halfCc = Array.ofDim[Double](k, k) // 0.5 · inter-centroid distances
    val s = new Array[Double](k)
    val drifts = new Array[Double](k)
    rec.markInitDone()

    var it = 0
    var converged = false

    while (it < maxIters && !converged) {
      // Inter-centroid half-distances and s(j).
      var j = 0
      while (j < k) {
        var best = Double.PositiveInfinity
        var j2 = 0
        while (j2 < k) {
          if (j2 != j) {
            val t = if (j2 < j) 2 * halfCc(j2)(j) else counter.dist(centroids(j), centroids(j2))
            halfCc(j)(j2) = t / 2
            if (t < best) best = t
          }
          j2 += 1
        }
        s(j) = best / 2
        j += 1
      }

      var i = 0
      while (i < n) {
        if (it == 0) {
          // Initial full scan fills every lower bound exactly.
          var best = -1; var bestD = Double.PositiveInfinity
          var c = 0
          while (c < k) {
            val t = counter.dist(data(i), centroids(c))
            l(i)(c) = t
            if (t < bestD) { bestD = t; best = c }
            c += 1
          }
          a(i) = best; u(i) = bestD
        } else if (u(i) > s(a(i))) {
          var tight = false
          var c = 0
          while (c < k) {
            if (c != a(i) && u(i) > l(i)(c) && u(i) > halfCc(a(i))(c)) {
              if (!tight) { // 3a: tighten the upper bound once
                u(i) = counter.dist(data(i), centroids(a(i)))
                l(i)(a(i)) = u(i)
                tight = true
              }
              if (u(i) > l(i)(c) && u(i) > halfCc(a(i))(c)) { // 3b
                val t = counter.dist(data(i), centroids(c))
                l(i)(c) = t
                if (t < u(i)) { a(i) = c; u(i) = t }
              }
            }
            c += 1
          }
        }
        i += 1
      }

      val (next, _) = KMeans.refine(data, a, centroids)
      var maxDrift = 0.0
      j = 0
      while (j < k) {
        drifts(j) = Vec.dist(next(j), centroids(j))
        if (drifts(j) > maxDrift) maxDrift = drifts(j)
        j += 1
      }
      centroids = next
      i = 0
      while (i < n) {
        u(i) += drifts(a(i))
        var c = 0
        while (c < k) { l(i)(c) = math.max(0.0, l(i)(c) - drifts(c)); c += 1 }
        i += 1
      }
      it += 1
      converged = maxDrift <= KMeans.Eps
      rec.markIterDone()
    }

    KMeansResult(centroids, a, it, rec.initMs, rec.iterMs, counter.count, 0L,
      extraMemoryFloats(n.toLong, k.toLong, data(0).length.toLong))
  }
}

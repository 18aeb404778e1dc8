package repro.estimator

import repro.core.{BallNode, BallTree}

/** Measures the *actual* memory of a built index, for Table VI's
  * estimated/actual accuracy.
  *
  * The byte model mirrors the paper's C++ device implementation (the thing
  * Eq. 10 approximates): every node allocates a pivot vector with its
  * container header, scalar fields, and two child pointers; every leaf
  * additionally allocates a point container with capacity reserved at the
  * configured leaf capacity f. Exactly the overheads the paper names as
  * unestimated — container headers, allocation headers, reserved-but-unused
  * capacity, and the tree's real (not idealised half-full balanced) shape —
  * are what make actual ≥/≈ estimated here. The JVM-side `sum` array our
  * nodes carry is a reproduction convenience (the paper reconstructs it as
  * p*·|N|) and is not counted.
  */
object MemoryMeter {

  /** malloc/object header per allocation. */
  private val AllocHeader = 16L

  /** std::vector-style container bookkeeping (ptr, size, capacity). */
  private val ContainerHeader = 24L

  /** Bytes of one tree as laid out on a 64-bit device. */
  def indexBytes(built: BallTree.Built, d: Int): Long = {
    var total = 0L
    def walk(n: BallNode): Unit = {
      // node: header + pivot container + d doubles + radius + count +
      // cluster id + two child pointers
      total += AllocHeader + ContainerHeader + 8L * d + 8L + 4L + 4L + 16L
      if (n.isLeaf) {
        // point container with capacity reserved at f (8-byte slots, as the
        // paper counts leaf entries as float-sized pointers)
        total += ContainerHeader + 8L * built.leafCapacity
      } else { walk(n.left); walk(n.right) }
    }
    walk(built.root)
    total
  }

  /** Actual extra bytes of a full Dask-means run: both indexes plus the
    * n-entry assignment array (4-byte ints plus its header).
    */
  def daskMeansActualBytes(pointIndex: BallTree.Built, centroidIndex: BallTree.Built, d: Int, n: Long): Long =
    indexBytes(pointIndex, d) + indexBytes(centroidIndex, d) + (AllocHeader + 4L * n)
}

package repro.core

import scala.collection.mutable.ArrayBuffer

/** Sorted set of executed slot indices with deterministic k-NN queries.
  *
  * Slots are 0-based internally (0 .. m-1); temporal distance between slots
  * `a` and `b` is `|a - b|` (paper's `|τ(a), τ(b)|_i`). k-NN ties (equal
  * distance left/right) break toward the smaller slot index so every
  * algorithm variant sees the same neighbour sets.
  *
  * Backed by a sorted `ArrayBuffer`; insertion is O(n) but n (number of
  * executed slots) is small relative to m, and binary-search lookup is the
  * O(log) path the paper describes for the sorted-list baseline.
  */
final class ExecutedSet(val m: Int) {
  private val buf = new ArrayBuffer[Int]

  def size: Int        = buf.length
  def isEmpty: Boolean = buf.isEmpty
  def toVector: Vector[Int] = buf.toVector

  def contains(j: Int): Boolean = {
    val i = lowerBound(j)
    i < buf.length && buf(i) == j
  }

  /** Index of first element >= j. */
  private def lowerBound(j: Int): Int = {
    var lo = 0; var hi = buf.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (buf(mid) < j) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Insert slot `j`; no-op if already present. */
  def add(j: Int): Unit = {
    require(j >= 0 && j < m, s"slot $j out of [0, $m)")
    val i = lowerBound(j)
    if (i >= buf.length || buf(i) != j) buf.insert(i, j)
  }

  /** The k executed slots nearest to `j` (ascending distance, ties toward the
    * smaller slot). Fewer than k are returned when fewer are executed.
    * `extra` (if >= 0) is treated as an additional executed slot — used for
    * tentative-execution what-if queries without mutating the set.
    */
  def knn(j: Int, k: Int, extra: Int = -1): IndexedSeq[Int] = {
    val out = new ArrayBuffer[Int](k)
    // Merge-walk two cursors (left: descending, right: ascending) plus the
    // optional extra slot folded in by distance.
    var li = lowerBound(j) - 1
    var ri = lowerBound(j)
    var extraUsed = extra < 0 || contains(extra)
    if (ri < buf.length && buf(ri) == j) { out += j; ri += 1 } // self, dist 0
    else if (!extraUsed && extra == j) { out += j; extraUsed = true }
    def extraDist: Int = math.abs(extra - j)
    while (out.length < k && (li >= 0 || ri < buf.length || !extraUsed)) {
      val ld = if (li >= 0) j - buf(li) else Int.MaxValue
      val rd = if (ri < buf.length) buf(ri) - j else Int.MaxValue
      val ed = if (!extraUsed) extraDist else Int.MaxValue
      // pick smallest distance; ties toward the smaller slot index
      if (ed <= ld && ed <= rd && !(ld == ed && buf(li) < extra) && !(rd == ed && buf(ri) < extra)) {
        out += extra; extraUsed = true
      } else if (ld <= rd) { out += buf(li); li -= 1 }
      else { out += buf(ri); ri += 1 }
    }
    out.toIndexedSeq
  }

  /** Distance from `j` to its k-th nearest executed slot, or Int.MaxValue if
    * fewer than k slots are executed. Used for the locality-window bound.
    */
  def kthDist(j: Int, k: Int): Int = {
    val nn = knn(j, k)
    if (nn.length < k) Int.MaxValue else math.abs(nn.last - j)
  }

  /** Nearest executed neighbours strictly for diagnostics/tests. */
  def nearest(j: Int): Option[Int] = knn(j, 1).headOption
}

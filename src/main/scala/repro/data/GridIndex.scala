package repro.data

import scala.collection.mutable.ArrayBuffer

/** Uniform-grid spatial index over points in the unit square with
  * ring-expansion k-NN search.
  *
  * This is the spatial indexing/pruning substrate for worker lookup: a k-NN
  * query inspects grid cells in growing rings around the query cell and
  * stops as soon as the best k distances cannot be beaten by any unvisited
  * ring (ring lower-bound pruning), so dense instances avoid the O(n) scan.
  */
final class GridIndex(xs: Array[Double], ys: Array[Double], ids: Array[Int], cells: Int) {
  require(xs.length == ys.length && ys.length == ids.length)
  private val cellSize = 1.0 / cells
  private val buckets = Array.fill(cells * cells)(new ArrayBuffer[Int]) // point indices

  locally {
    var i = 0
    while (i < xs.length) {
      buckets(cellOf(xs(i), ys(i))) += i
      i += 1
    }
  }

  def size: Int = xs.length

  private def clampCell(c: Int): Int = math.max(0, math.min(cells - 1, c))
  private def cellOf(x: Double, y: Double): Int =
    clampCell((y / cellSize).toInt) * cells + clampCell((x / cellSize).toInt)

  /** Ids and distances of the k nearest points to (x, y), ascending by
    * (distance, id) — the id tie-break keeps results deterministic.
    */
  def knn(x: Double, y: Double, k: Int): (Array[Int], Array[Double]) = {
    if (size == 0) return (Array.empty, Array.empty)
    val cx = clampCell((x / cellSize).toInt)
    val cy = clampCell((y / cellSize).toInt)
    // (dist, id, index) of current best candidates, kept sorted ascending.
    val best = new ArrayBuffer[(Double, Int)](k + 1)
    def consider(i: Int): Unit = {
      val dx = xs(i) - x; val dy = ys(i) - y
      val d = math.sqrt(dx * dx + dy * dy)
      val key = (d, ids(i))
      var pos = best.length
      var j = 0
      var placed = false
      while (j < best.length && !placed) {
        if (Ordering[(Double, Int)].lt(key, best(j))) { pos = j; placed = true }
        j += 1
      }
      if (best.length < k || pos < best.length) {
        best.insert(pos, key)
        if (best.length > k) best.remove(best.length - 1)
      }
    }
    var ring = 0
    var done = false
    val maxRing = cells // worst case covers the whole grid
    while (!done && ring <= maxRing) {
      // Visit cells at Chebyshev distance `ring` from (cx, cy).
      var yy = cy - ring
      while (yy <= cy + ring) {
        var xx = cx - ring
        while (xx <= cx + ring) {
          val onRing = math.max(math.abs(xx - cx), math.abs(yy - cy)) == ring
          if (onRing && xx >= 0 && xx < cells && yy >= 0 && yy < cells) {
            val b = buckets(yy * cells + xx)
            var t = 0
            while (t < b.length) { consider(b(t)); t += 1 }
          }
          xx += 1
        }
        yy += 1
      }
      // Prune: any point in ring r+1 is at least r*cellSize away (points in
      // the current ring's cells can still be closer than the ring bound).
      if (best.length >= k && best(k - 1)._1 <= ring * cellSize) done = true
      ring += 1
    }
    (best.map(_._2).toArray, best.map(_._1).toArray)
  }
}

object GridIndex {
  /** Build an index sized so the average bucket holds a handful of points. */
  def apply(points: Seq[(Int, Double, Double)]): GridIndex = {
    val n = math.max(1, points.size)
    val cells = math.max(1, math.min(128, math.sqrt(n / 4.0).toInt))
    new GridIndex(
      points.map(_._2).toArray,
      points.map(_._3).toArray,
      points.map(_._1).toArray,
      cells)
  }
}

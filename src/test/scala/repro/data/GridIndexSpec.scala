package repro.data

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Grid spatial index vs brute-force k-NN. */
class GridIndexSpec extends AnyFunSuite {

  private def brute(points: Seq[(Int, Double, Double)], x: Double, y: Double,
                    k: Int): Seq[(Int, Double)] =
    points.map { case (id, px, py) =>
      (id, math.sqrt((px - x) * (px - x) + (py - y) * (py - y)))
    }.sortBy { case (id, d) => (d, id) }.take(k)

  test("empty index returns empty result") {
    val idx = GridIndex(Seq.empty)
    val (ids, ds) = idx.knn(0.5, 0.5, 3)
    assert(ids.isEmpty && ds.isEmpty)
  }

  test("single point") {
    val idx = GridIndex(Seq((7, 0.2, 0.9)))
    val (ids, ds) = idx.knn(0.2, 0.9, 2)
    assert(ids.toSeq == Seq(7))
    assert(ds(0) == 0.0)
  }

  test("knn matches brute force on random point sets") {
    val rnd = new Random(41)
    for (_ <- 0 until 30) {
      val n = 1 + rnd.nextInt(400)
      val pts = (0 until n).map(i => (i, rnd.nextDouble(), rnd.nextDouble()))
      val idx = GridIndex(pts)
      for (_ <- 0 until 10) {
        val (qx, qy) = (rnd.nextDouble(), rnd.nextDouble())
        val k = 1 + rnd.nextInt(8)
        val (ids, ds) = idx.knn(qx, qy, k)
        val expected = brute(pts, qx, qy, k)
        assert(ids.toSeq == expected.map(_._1), s"n=$n q=($qx,$qy) k=$k")
        ids.indices.foreach(i => assert(math.abs(ds(i) - expected(i)._2) < 1e-12))
      }
    }
  }

  test("k larger than the point count returns all points") {
    val pts = Seq((1, 0.1, 0.1), (2, 0.9, 0.9))
    val (ids, _) = GridIndex(pts).knn(0.0, 0.0, 10)
    assert(ids.toSet == Set(1, 2))
  }

  test("distances are ascending") {
    val rnd = new Random(42)
    val pts = (0 until 200).map(i => (i, rnd.nextDouble(), rnd.nextDouble()))
    val (_, ds) = GridIndex(pts).knn(0.3, 0.7, 12)
    assert(ds.toSeq == ds.toSeq.sorted)
  }

  test("query outside the unit square still works (clamped cells)") {
    val pts = Seq((1, 0.5, 0.5), (2, 0.1, 0.1))
    val (ids, _) = GridIndex(pts).knn(1.5, 1.5, 1)
    assert(ids.toSeq == Seq(1))
  }
}

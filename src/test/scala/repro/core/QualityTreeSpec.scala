package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for the aggregated tree index approximating the 1-D order-k
  * Voronoi diagram (Section III-C).
  */
class QualityTreeSpec extends AnyFunSuite {

  test("empty tree has quality 0 and a single root cell") {
    val t = new QualityTree(32, 3, 4)
    t.rebuild()
    assert(t.quality == 0.0)
    assert(t.leafSegments == Vector((0, 31))) // knn(l)=knn(r)=∅ stops at root
  }

  test("aggregated q' equals full recomputation after every insert") {
    val rnd = new Random(21)
    for (_ <- 0 until 25) {
      val m = 16 + rnd.nextInt(80)
      val t = new QualityTree(m, 1 + rnd.nextInt(3), 4)
      t.rebuild()
      val order = rnd.shuffle((0 until m).toList).take(1 + rnd.nextInt(m / 2))
      order.foreach { e =>
        t.insert(e)
        assert(math.abs(t.quality - t.recomputeFromScratch()) < 1e-9,
          s"m=$m after $e (order $order)")
      }
    }
  }

  test("leaf segments tile [0, m-1] without gaps or overlaps") {
    val rnd = new Random(22)
    for (_ <- 0 until 20) {
      val m = 16 + rnd.nextInt(60)
      val t = new QualityTree(m, 2, 4)
      t.rebuild()
      rnd.shuffle((0 until m).toList).take(m / 3).foreach(t.insert)
      val segs = t.leafSegments
      assert(segs.head._1 == 0 && segs.last._2 == m - 1)
      segs.sliding(2).foreach {
        case Vector((_, r1), (l2, _)) => assert(l2 == r1 + 1)
        case _                        =>
      }
    }
  }

  test("Lemma 8: inside a knn(l)=knn(r) leaf all slots share the k-NN set") {
    val rnd = new Random(23)
    for (_ <- 0 until 20) {
      val m = 20 + rnd.nextInt(60)
      val k = 1 + rnd.nextInt(3)
      val t = new QualityTree(m, k, 1) // ts=1: only Condition 1 stops splits
      t.rebuild()
      rnd.shuffle((0 until m).toList).take(3 + rnd.nextInt(m / 3)).foreach(t.insert)
      val ex = t.executedSet
      t.leafSegments.foreach { case (l, r) =>
        if (ex.knn(l, k) == ex.knn(r, k)) {
          val expected = ex.knn(l, k)
          (l to r).foreach { e =>
            if (!ex.contains(e))
              assert(ex.knn(e, k) == expected, s"leaf [$l,$r] slot $e")
          }
        }
      }
    }
  }

  test("larger t_s yields fewer nodes") {
    val m = 200
    val counts = Seq(2, 4, 8, 16).map { ts =>
      val t = new QualityTree(m, 3, ts)
      t.rebuild()
      Seq(10, 50, 90, 130, 170).foreach(t.insert)
      t.nodeCount
    }
    assert(counts == counts.sorted.reverse, s"node counts not decreasing: $counts")
  }

  test("influence-range skipping leaves untouched subtrees consistent") {
    val rnd = new Random(24)
    val m = 120
    val t = new QualityTree(m, 3, 4)
    t.rebuild()
    val order = rnd.shuffle((0 until m).toList).take(40)
    order.foreach(t.insert)
    assert(t.nodesSkipped > 0, "locality never skipped a subtree")
    assert(math.abs(t.quality - t.recomputeFromScratch()) < 1e-9)
  }

  test("tree quality matches QualityState for identical insert sequences") {
    val rnd = new Random(25)
    val m = 90
    val k = 3
    val tree = new QualityTree(m, k, 4)
    tree.rebuild()
    val st = new QualityState(m, k)
    rnd.shuffle((0 until m).toList).take(30).foreach { e =>
      tree.insert(e)
      st.insert(e)
      assert(math.abs(tree.quality - st.quality) < 1e-9)
    }
  }
}

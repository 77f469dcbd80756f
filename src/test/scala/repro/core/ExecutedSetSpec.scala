package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for the sorted executed-slot set and its deterministic k-NN.
  * Property-style coverage uses seeded random instances (the offline image
  * ships scalacheck but not the scalatest bridge, so loops it is).
  */
class ExecutedSetSpec extends AnyFunSuite {

  /** Brute-force k-NN with the same tie rule (distance, then smaller slot). */
  private def bruteKnn(slots: Seq[Int], j: Int, k: Int, extra: Int = -1): Seq[Int] = {
    val all = (slots ++ (if (extra >= 0 && !slots.contains(extra)) Seq(extra) else Nil)).distinct
    all.sortBy(e => (math.abs(e - j), e)).take(k)
  }

  private def randomCase(rnd: Random): (Int, List[Int]) = {
    val m = 5 + rnd.nextInt(56)
    val n = rnd.nextInt(m + 1)
    (m, rnd.shuffle((0 until m).toList).take(n).sorted)
  }

  test("add keeps slots sorted and deduplicated") {
    val s = new ExecutedSet(20)
    Seq(5, 1, 9, 5, 1).foreach(s.add)
    assert(s.toVector == Vector(1, 5, 9))
    assert(s.size == 3)
  }

  test("contains") {
    val s = new ExecutedSet(10)
    s.add(3)
    assert(s.contains(3) && !s.contains(4))
  }

  test("add out of range throws") {
    val s = new ExecutedSet(10)
    intercept[IllegalArgumentException](s.add(10))
    intercept[IllegalArgumentException](s.add(-1))
  }

  test("isEmpty") {
    val s = new ExecutedSet(4)
    assert(s.isEmpty)
    s.add(0)
    assert(!s.isEmpty)
  }

  test("knn on the paper example") {
    val s = new ExecutedSet(100)
    Seq(1, 3, 6, 8).foreach(s.add) // 0-based {2,4,7,9} of Fig 3
    assert(s.knn(0, 2) == IndexedSeq(1, 3))
    assert(s.knn(4, 2).toSet == Set(3, 6)) // dists 1 and 2
  }

  test("knn tie breaks toward the smaller slot") {
    val s = new ExecutedSet(10)
    Seq(2, 6).foreach(s.add)
    assert(s.knn(4, 1) == IndexedSeq(2)) // both at distance 2
  }

  test("knn of an executed slot includes itself first") {
    val s = new ExecutedSet(10)
    Seq(4, 7).foreach(s.add)
    assert(s.knn(4, 2) == IndexedSeq(4, 7))
  }

  test("knn returns fewer than k when fewer executed") {
    val s = new ExecutedSet(10)
    s.add(1)
    assert(s.knn(5, 3) == IndexedSeq(1))
  }

  test("kthDist is MaxValue when fewer than k executed") {
    val s = new ExecutedSet(10)
    s.add(2)
    assert(s.kthDist(5, 2) == Int.MaxValue)
    assert(s.kthDist(5, 1) == 3)
  }

  test("nearest") {
    val s = new ExecutedSet(10)
    assert(s.nearest(3).isEmpty)
    s.add(8)
    assert(s.nearest(3).contains(8))
  }

  test("property: knn matches brute force for random sets") {
    val rnd = new Random(1)
    for (_ <- 0 until 200) {
      val (m, slots) = randomCase(rnd)
      val k = 1 + rnd.nextInt(5)
      val s = new ExecutedSet(m)
      slots.foreach(s.add)
      for (j <- 0 until m) {
        assert(s.knn(j, k) == bruteKnn(slots, j, k), s"m=$m j=$j k=$k slots=$slots")
      }
    }
  }

  test("property: knn with tentative extra slot matches brute force") {
    val rnd = new Random(2)
    for (_ <- 0 until 100) {
      val (m, slots) = randomCase(rnd)
      val k = 1 + rnd.nextInt(4)
      val s = new ExecutedSet(m)
      slots.foreach(s.add)
      for (extra <- 0 until m if !slots.contains(extra); j <- 0 until m) {
        assert(s.knn(j, k, extra) == bruteKnn(slots, j, k, extra),
          s"m=$m j=$j k=$k extra=$extra slots=$slots")
      }
    }
  }

  test("property: kthDist agrees with knn") {
    val rnd = new Random(3)
    for (_ <- 0 until 200) {
      val (m, slots) = randomCase(rnd)
      val k = 1 + rnd.nextInt(4)
      val s = new ExecutedSet(m)
      slots.foreach(s.add)
      for (j <- 0 until m) {
        val nn = s.knn(j, k)
        val expected = if (nn.length < k) Int.MaxValue else math.abs(nn.last - j)
        assert(s.kthDist(j, k) == expected)
      }
    }
  }
}

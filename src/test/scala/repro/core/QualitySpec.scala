package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the entropy quality metric (Eq 1–5). */
class QualitySpec extends AnyFunSuite {
  private val eps = 1e-12

  private def setOf(m: Int, slots: Int*): ExecutedSet = {
    val s = new ExecutedSet(m)
    slots.foreach(s.add)
    s
  }

  test("contribution of p=0 is 0") { assert(Quality.contribution(0.0) == 0.0) }
  test("contribution of negative p is 0") { assert(Quality.contribution(-0.5) == 0.0) }
  test("contribution of p=1 is 0") { assert(math.abs(Quality.contribution(1.0)) < eps) }
  test("contribution is positive for p in (0,1)") {
    assert(Quality.contribution(0.01) > 0)
    assert(Quality.contribution(0.5) > 0)
  }
  test("log2 computes base-2 logarithm") {
    assert(math.abs(Quality.log2(8.0) - 3.0) < eps)
    assert(math.abs(Quality.log2(1.0)) < eps)
  }

  test("paper example: rho_err of slot 1 with 2-NN {2,4}, m=100, k=2 is 0.02") {
    // Paper Fig 2 / Section II-B, 1-based slots: |t1,t2|=1, |t1,t4|=3.
    // 0-based: j=0, executed {1, 3}.
    val s = setOf(100, 1, 3)
    val nn = s.knn(0, 2)
    assert(nn.toSet == Set(1, 3))
    assert(math.abs(Quality.errRatio(0, nn, 2, 100) - 0.02) < eps)
  }

  test("executed subtask has error ratio 0 and p = 1/m") {
    val s = setOf(100, 5)
    assert(Quality.finishProb(5, s, 3) == 1.0 / 100)
  }

  test("p = 0 when nothing is executed") {
    val s = new ExecutedSet(50)
    (0 until 50).foreach(j => assert(Quality.finishProb(j, s, 3) == 0.0))
  }

  test("error ratio is 1 when nothing is executed (phantom neighbours)") {
    assert(math.abs(Quality.errRatio(7, IndexedSeq.empty, 3, 50) - 1.0) < eps)
  }

  test("fewer than k neighbours: missing ones count distance m (footnote 2)") {
    val m = 10; val k = 3
    val s = setOf(m, 4)
    val nn = s.knn(0, k)
    assert(nn == IndexedSeq(4))
    val expected = (4.0 + 2 * m) / (k * m)
    assert(math.abs(Quality.errRatio(0, nn, k, m) - expected) < eps)
  }

  test("quality of empty set is 0") {
    assert(Quality.quality(new ExecutedSet(40), 3) == 0.0)
  }

  test("quality of fully executed task is log2(m)") {
    val m = 64
    val s = setOf(m, 0 until m: _*)
    assert(math.abs(Quality.quality(s, 3) - Quality.log2(m)) < 1e-9)
  }

  test("quality is within [0, log2 m] for arbitrary sets") {
    val m = 30
    val s = setOf(m, 2, 7, 9, 21)
    val q = Quality.quality(s, 3)
    assert(q >= 0 && q <= Quality.log2(m) + eps)
  }

  test("closer executed neighbours give lower error ratio") {
    val m = 100
    val near = Quality.errRatio(10, IndexedSeq(9, 12), 2, m)
    val far  = Quality.errRatio(10, IndexedSeq(30, 50), 2, m)
    assert(near < far)
  }

  test("qualityOf convenience agrees with quality") {
    val m = 25
    val slots = Seq(1, 5, 17)
    assert(Quality.qualityOf(m, slots, 3) == Quality.quality(setOf(m, slots: _*), 3))
  }

  // ----- reliability extension -------------------------------------------

  test("reliability lambda=1 degenerates to the base metric") {
    val m = 40
    val s = setOf(m, 3, 11, 29)
    (0 until m).foreach { j =>
      val base = Quality.finishProb(j, s, 3)
      val ext  = Quality.finishProbReliability(j, s, 3, _ => 1.0)
      assert(math.abs(base - ext) < 1e-12, s"slot $j: $base vs $ext")
    }
  }

  test("executed slot probability scales with its worker's reliability") {
    val m = 20
    val s = setOf(m, 4)
    assert(math.abs(Quality.finishProbReliability(4, s, 2, _ => 0.5) - 0.5 / m) < 1e-12)
  }

  test("lower reliability never increases quality") {
    val m = 30
    val s = setOf(m, 2, 9, 15, 22)
    val qFull = Quality.qualityReliability(s, 3, _ => 1.0)
    val qHalf = Quality.qualityReliability(s, 3, _ => 0.6)
    assert(qHalf <= qFull + 1e-12)
  }

  test("reliability probability never negative") {
    val m = 12
    val s = setOf(m, 0)
    (0 until m).foreach { j =>
      assert(Quality.finishProbReliability(j, s, 3, _ => 0.05) >= 0.0)
    }
  }
}

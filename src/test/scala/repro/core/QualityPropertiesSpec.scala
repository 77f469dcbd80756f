package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Property tests for the paper's Lemmas: monotonicity and submodularity of
  * the quality metric (Lemmas 2, 6, 7), plus the incremental engine's
  * equivalence to full recomputation.
  */
class QualityPropertiesSpec extends AnyFunSuite {

  private def randomSet(rnd: Random, m: Int, n: Int): List[Int] =
    rnd.shuffle((0 until m).toList).take(n).sorted

  test("Lemma 7 (monotone): executing a subtask never decreases q") {
    val rnd = new Random(11)
    for (_ <- 0 until 150) {
      val m = 8 + rnd.nextInt(50)
      val k = 1 + rnd.nextInt(4)
      val base = randomSet(rnd, m, rnd.nextInt(m))
      val q0 = Quality.qualityOf(m, base, k)
      val free = (0 until m).filterNot(base.contains(_))
      if (free.nonEmpty) {
        val e = free(rnd.nextInt(free.length))
        val q1 = Quality.qualityOf(m, base :+ e, k)
        assert(q1 >= q0 - 1e-12, s"m=$m k=$k S=$base e=$e: $q0 -> $q1")
      }
    }
  }

  test("Lemma 6 (submodular): marginal gains shrink as the set grows") {
    val rnd = new Random(12)
    for (_ <- 0 until 150) {
      val m = 8 + rnd.nextInt(40)
      val k = 1 + rnd.nextInt(3)
      val small = randomSet(rnd, m, rnd.nextInt(m / 2))
      val extras = (0 until m).filterNot(small.contains(_))
      if (extras.length >= 2) {
        val shuffled = rnd.shuffle(extras.toList)
        val x = shuffled.head           // element to grow the set with
        val e = shuffled.tail.head      // element whose marginal we compare
        val big = small :+ x
        val gSmall = Quality.qualityOf(m, small :+ e, k) - Quality.qualityOf(m, small, k)
        val gBig   = Quality.qualityOf(m, big :+ e, k)   - Quality.qualityOf(m, big, k)
        assert(gBig <= gSmall + 1e-9,
          s"m=$m k=$k small=$small x=$x e=$e: gain grew $gSmall -> $gBig")
      }
    }
  }

  test("error ratio is non-increasing in the executed set (Eq 12)") {
    val rnd = new Random(13)
    for (_ <- 0 until 100) {
      val m = 10 + rnd.nextInt(40)
      val k = 1 + rnd.nextInt(3)
      val base = randomSet(rnd, m, 1 + rnd.nextInt(m - 2))
      val s0 = new ExecutedSet(m); base.foreach(s0.add)
      val free = (0 until m).filterNot(base.contains(_))
      if (free.nonEmpty) {
        val e = free(rnd.nextInt(free.length))
        val s1 = new ExecutedSet(m); (base :+ e).foreach(s1.add)
        for (j <- 0 until m if !s1.contains(j)) {
          val r0 = Quality.errRatio(j, s0.knn(j, k), k, m)
          val r1 = Quality.errRatio(j, s1.knn(j, k), k, m)
          assert(r1 <= r0 + 1e-12, s"slot $j: rho grew $r0 -> $r1")
        }
      }
    }
  }

  test("QualityState.insert tracks full recomputation") {
    val rnd = new Random(14)
    for (_ <- 0 until 50) {
      val m = 10 + rnd.nextInt(60)
      val k = 1 + rnd.nextInt(4)
      val st = new QualityState(m, k)
      val order = rnd.shuffle((0 until m).toList).take(1 + rnd.nextInt(m))
      order.foreach { t =>
        st.insert(t)
        assert(math.abs(st.quality - st.recomputeFromScratch()) < 1e-9,
          s"m=$m k=$k after inserting up to $t")
      }
    }
  }

  test("QualityState.deltaQ is bit-identical to the naive full-scan marginal") {
    val rnd = new Random(15)
    for (_ <- 0 until 60) {
      val m = 10 + rnd.nextInt(50)
      val k = 1 + rnd.nextInt(4)
      val st = new QualityState(m, k)
      randomSet(rnd, m, rnd.nextInt(m - 1)).foreach(st.insert)
      for (t <- 0 until m if !st.isExecuted(t)) {
        val windowed = st.deltaQ(t)
        val naive = GreedyNaive.deltaQNaive(st.executed, k, t)
        assert(windowed == naive,
          s"m=$m k=$k t=$t: windowed=$windowed naive=$naive")
      }
    }
  }

  test("deltaQ equals the realized insert gain") {
    val rnd = new Random(16)
    for (_ <- 0 until 60) {
      val m = 10 + rnd.nextInt(40)
      val k = 1 + rnd.nextInt(3)
      val st = new QualityState(m, k)
      randomSet(rnd, m, rnd.nextInt(m - 1)).foreach(st.insert)
      val free = (0 until m).filterNot(st.isExecuted)
      if (free.nonEmpty) {
        val t = free(rnd.nextInt(free.length))
        val predicted = st.deltaQ(t)
        val before = st.quality
        st.insert(t)
        assert(math.abs((st.quality - before) - predicted) < 1e-9)
      }
    }
  }

  test("window contains every slot whose contribution changes") {
    val rnd = new Random(17)
    for (_ <- 0 until 60) {
      val m = 10 + rnd.nextInt(40)
      val k = 1 + rnd.nextInt(3)
      val st = new QualityState(m, k)
      randomSet(rnd, m, rnd.nextInt(m - 1)).foreach(st.insert)
      val free = (0 until m).filterNot(st.isExecuted)
      if (free.nonEmpty) {
        val t = free(rnd.nextInt(free.length))
        val (lo, hi) = st.window(t)
        val before = (0 until m).map(st.contributionOf)
        st.insert(t)
        for (j <- 0 until m if j < lo || j > hi) {
          assert(st.contributionOf(j) == before(j),
            s"slot $j outside window [$lo,$hi] changed on insert of $t")
        }
      }
    }
  }

  test("singleton qualities match the generic metric for all slots") {
    for (m <- Seq(5, 17, 40, 101); k <- Seq(1, 2, 3, 5)) {
      val singles = Singletons.qualities(m, k)
      for (t <- 0 until m) {
        val expected = Quality.qualityOf(m, Seq(t), k)
        assert(math.abs(singles(t) - expected) < 1e-9, s"m=$m k=$k t=$t")
      }
    }
  }

  test("quality is symmetric under timeline reversal") {
    val rnd = new Random(18)
    for (_ <- 0 until 40) {
      val m = 8 + rnd.nextInt(30)
      val k = 1 + rnd.nextInt(3)
      val s = randomSet(rnd, m, 1 + rnd.nextInt(m - 1))
      val mirrored = s.map(m - 1 - _)
      assert(math.abs(Quality.qualityOf(m, s, k) - Quality.qualityOf(m, mirrored, k)) < 1e-9)
    }
  }
}

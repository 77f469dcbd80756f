package repro.spark

import repro.{Oracle, SparkSpec}
import repro.core.{ExecutedSet, Quality}
import scala.util.Random

/** The Catalyst probability pipeline vs the core engine and the DuckDB
  * oracle (Eq 1–3 as SQL).
  */
class ProbabilitySqlSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private val k = 3
  private val m = 20

  private def frames(executedByTask: Map[Int, Seq[Int]]) = {
    import spark.implicits._
    val taskIds = executedByTask.keys.toSeq.sorted
    val slots = taskIds.flatMap(t => (0 until m).map(s => (t, s))).toDF("task_id", "slot")
    val executed = executedByTask.toSeq.flatMap { case (t, ss) => ss.map((t, _)) }
      .toDF("task_id", "slot")
    (slots, executed)
  }

  test("pipeline matches the core metric slot by slot") {
    val rnd = new Random(81)
    val executedByTask = (0 until 4).map { t =>
      t -> rnd.shuffle((0 until m).toList).take(rnd.nextInt(m)).sorted.toSeq
    }.toMap
    val (slots, executed) = frames(executedByTask)
    val probs = ProbabilitySql.probabilities(spark, slots, executed, k, m)
      .collect().map(r => (r.getInt(0), r.getInt(1)) -> r.getDouble(2)).toMap
    for ((t, ss) <- executedByTask) {
      val es = new ExecutedSet(m)
      ss.foreach(es.add)
      for (j <- 0 until m) {
        val expected = Quality.finishProb(j, es, k)
        assert(math.abs(probs((t, j)) - expected) < 1e-9,
          s"task $t slot $j: spark=${probs((t, j))} core=$expected")
      }
    }
  }

  test("pipeline agrees with DuckDB running the same SQL (oracle)") {
    val executedByTask = Map(0 -> Seq(1, 3, 6, 8), 1 -> Seq(0, 19), 2 -> Seq.empty[Int])
    val (slots, executed) = frames(executedByTask)
    val sparkDf = ProbabilitySql.probabilities(spark, slots, executed, k, m)
    Oracle.assertEquivalent(sparkDf, ProbabilitySql.duckSql(k, m),
      "slots" -> slots, "executed" -> executed)
  }

  test("oracle check with a random plan and k=2") {
    val rnd = new Random(82)
    val executedByTask = (0 until 3).map { t =>
      t -> rnd.shuffle((0 until m).toList).take(5).sorted.toSeq
    }.toMap
    val (slots, executed) = frames(executedByTask)
    val sparkDf = ProbabilitySql.probabilities(spark, slots, executed, 2, m)
    Oracle.assertEquivalent(sparkDf, ProbabilitySql.duckSql(2, m),
      "slots" -> slots, "executed" -> executed)
  }

  test("task with no executions gets p = 0 everywhere") {
    val (slots, executed) = frames(Map(0 -> Seq.empty[Int]))
    val probs = ProbabilitySql.probabilities(spark, slots, executed, k, m)
    assert(probs.agg(sum(abs(col("p")))).collect()(0).getDouble(0) == 0.0)
  }

  test("registered UDAF quality matches DuckDB entropy aggregation") {
    val rnd = new Random(83)
    import spark.implicits._
    val probsRows = for {
      t <- 0 until 5
      s <- 0 until m
    } yield (t, s, if (rnd.nextBoolean()) rnd.nextDouble() / m else 0.0)
    val probs = probsRows.toDF("task_id", "slot", "p")
    val sparkQ = ProbabilitySql.qualities(spark, probs.select($"task_id", $"p"))
    Oracle.assertEquivalent(sparkQ, ProbabilitySql.duckQualitySql, "probs" -> probs)
  }

  test("UDAF quality equals the core quality for a real plan") {
    import spark.implicits._
    val executedSlots = Seq(2, 5, 11, 17)
    val es = new ExecutedSet(m)
    executedSlots.foreach(es.add)
    val probs = (0 until m).map(j => (0, Quality.finishProb(j, es, k)))
      .toDF("task_id", "p")
    val q = ProbabilitySql.qualities(spark, probs).collect()(0).getDouble(1)
    assert(math.abs(q - Quality.quality(es, k)) < 1e-9)
  }
}

package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Subtask finishing probabilities (Eq 2–3) as a Catalyst pipeline.
  *
  * Inputs: `slots(task_id, slot)` — every subtask of every task — and
  * `executed(task_id, slot)` — the assignment plan. Output:
  * `(task_id, slot, p)` with the paper's k-NN interpolation semantics,
  * including footnote 2 (missing neighbours at distance m) and the
  * deterministic tie-break (smaller executed slot wins at equal distance),
  * matching `repro.core.Quality` bit-for-bit in intent and to 1e-6 in tests.
  *
  * `duckSql` is the same computation in portable SQL, run on DuckDB by
  * `repro.Oracle.assertEquivalent` against this pipeline's output.
  */
object ProbabilitySql {

  def probabilities(spark: SparkSession, slots: DataFrame, executed: DataFrame,
                    k: Int, m: Int): DataFrame = {
    import spark.implicits._
    val s = slots.select($"task_id".cast("int").as("task_id"), $"slot".cast("int").as("slot"))
    val e = executed.select($"task_id".cast("int").as("task_id"), $"slot".cast("int").as("eslot"))

    val dists = s.join(e, "task_id")
      .select($"task_id", $"slot", $"eslot", abs($"slot" - $"eslot").as("dist"))
    val w = Window.partitionBy($"task_id", $"slot").orderBy($"dist", $"eslot")
    val knn = dists.withColumn("rn", row_number().over(w))
      .filter($"rn" <= k)
      .groupBy($"task_id", $"slot")
      .agg(sum($"dist").as("dsum"), count(lit(1)).as("cnt"))

    val exFlag = e.select($"task_id", $"eslot".as("slot")).withColumn("is_exec", lit(1))
    s.join(exFlag, Seq("task_id", "slot"), "left")
      .join(knn, Seq("task_id", "slot"), "left")
      .select(
        $"task_id", $"slot",
        when($"is_exec".isNotNull, lit(1.0) / m)
          .when($"dsum".isNull, lit(0.0))
          .otherwise(
            (lit(1.0) - ($"dsum" + (lit(k) - $"cnt") * m) / lit(k.toDouble * m)) / m)
          .as("p"))
  }

  /** DuckDB-dialect equivalent over VARCHAR-typed oracle tables. */
  def duckSql(k: Int, m: Int): String =
    s"""WITH s AS (SELECT CAST(task_id AS INT) AS task_id, CAST(slot AS INT) AS slot FROM slots),
       |     e AS (SELECT CAST(task_id AS INT) AS task_id, CAST(slot AS INT) AS slot FROM executed),
       |     d AS (SELECT s.task_id, s.slot, e.slot AS eslot, ABS(s.slot - e.slot) AS dist,
       |                  ROW_NUMBER() OVER (PARTITION BY s.task_id, s.slot
       |                                     ORDER BY ABS(s.slot - e.slot), e.slot) AS rn
       |           FROM s JOIN e ON s.task_id = e.task_id),
       |     knn AS (SELECT task_id, slot, SUM(dist) AS dsum, COUNT(*) AS cnt
       |             FROM d WHERE rn <= $k GROUP BY task_id, slot)
       |SELECT s.task_id AS task_id, s.slot AS slot,
       |       CASE WHEN ex.slot IS NOT NULL THEN 1.0 / $m
       |            WHEN knn.dsum IS NULL THEN 0.0
       |            ELSE (1.0 - (knn.dsum + ($k - knn.cnt) * $m) / (1.0 * $k * $m)) / $m
       |       END AS p
       |FROM s
       |LEFT JOIN e  AS ex  ON s.task_id = ex.task_id  AND s.slot = ex.slot
       |LEFT JOIN knn       ON s.task_id = knn.task_id AND s.slot = knn.slot
       |""".stripMargin

  /** Per-task quality via the registered UDAF over a probability frame. */
  def qualities(spark: SparkSession, probs: DataFrame): DataFrame = {
    QualityFunctions.register(spark)
    probs.createOrReplaceTempView("tcsc_probs")
    spark.sql(
      "SELECT task_id, tcsc_quality(p) AS q FROM tcsc_probs GROUP BY task_id")
  }

  /** DuckDB-dialect quality aggregation over a `probs` oracle table. */
  val duckQualitySql: String =
    """SELECT CAST(task_id AS INT) AS task_id,
      |       -SUM(CASE WHEN CAST(p AS DOUBLE) > 0
      |                 THEN CAST(p AS DOUBLE) * LOG2(CAST(p AS DOUBLE))
      |                 ELSE 0.0 END) AS q
      |FROM probs GROUP BY CAST(task_id AS INT)
      |""".stripMargin
}

package repro

import org.apache.spark.sql.functions._

/** Sanity checks for the DuckDB oracle harness itself. */
class OracleSpec extends SparkSpec {

  test("oracle accepts an equivalent aggregation") {
    import spark.implicits._
    val df = Seq((1, 10.0), (1, 20.0), (2, 5.0)).toDF("k", "v")
    val sparkAgg = df.groupBy($"k").agg(sum($"v").as("s"))
    Oracle.assertEquivalent(sparkAgg,
      "SELECT CAST(k AS INT) AS k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
      "t" -> df)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq((1, 10.0), (2, 5.0)).toDF("k", "v")
    val wrong = df.groupBy($"k").agg((sum($"v") + 1).as("s"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT CAST(k AS INT) AS k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
        "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, 10.0)).toDF("k", "v")
    val renamed = df.select($"k".as("key"), $"v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(renamed, "SELECT k, v FROM t", "t" -> df)
    }
  }

  test("oracle handles nulls") {
    import spark.implicits._
    val df = Seq((1, Some(1.0)), (2, None)).toDF("k", "v")
    Oracle.assertEquivalent(df.select($"k", $"v"),
      "SELECT CAST(k AS INT) AS k, CAST(v AS DOUBLE) AS v FROM t", "t" -> df)
  }
}

package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators (kept alongside the TCSC
  * generators in `repro.data.TcscGen`) and the oracle plumbing over them.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    val tiny = SynthData.lineitem(spark, sf = 0.001)
    assert(tiny.count() == 6000L)
    assert(tiny.columns.contains("l_quantity"))
  }

  test("zipfKeys is skewed, uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
      .groupBy("k").count().orderBy(desc("count"))
    val topZ = z.first().getLong(1)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
      .groupBy("k").count().orderBy(desc("count"))
    val topU = u.first().getLong(1)
    assert(topZ > topU * 3, s"zipf top $topZ vs uniform top $topU")
  }

  test("oracle validates an aggregation over generated orders") {
    // Project away the DateType column: the oracle only needs the grouping
    // key, and java.sql.Date decoding is unsupported in this forked JVM.
    val orders = SynthData.orders(spark, sf = 0.001)
      .select("o_orderkey", "o_orderstatus", "o_totalprice")
    val agg = orders.groupBy("o_orderstatus")
      .agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(agg,
      "SELECT o_orderstatus, COUNT(*) AS n FROM orders GROUP BY o_orderstatus",
      "orders" -> orders)
  }
}

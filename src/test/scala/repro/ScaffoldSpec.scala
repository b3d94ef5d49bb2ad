package repro

import org.apache.spark.sql.functions._

/** Sanity checks for the provided scaffold (SynthData generators + DuckDB
  * oracle): exercises the oracle plumbing end-to-end so index/stats suites
  * can rely on it.
  */
class ScaffoldSpec extends SparkSpec {

  test("TPC-H-lite lineitem aggregation matches DuckDB") {
    // project away the DateType column: collecting java.sql.Date rows
    // trips EXPRESSION_DECODING_FAILED on this JVM, and the oracle inserts
    // VARCHAR anyway.
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_linestatus")
    val agg = li.groupBy(col("l_returnflag"))
      .agg(count(lit(1)).cast("string") as "cnt")
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, CAST(COUNT(*) AS VARCHAR) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("orders/customer join count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey")
    val j = o.join(c, o("o_custkey") === c("c_custkey"))
      .agg(count(lit(1)).cast("string") as "cnt")
    Oracle.assertEquivalent(
      j,
      "SELECT CAST(COUNT(*) AS VARCHAR) AS cnt FROM orders o JOIN customer c ON o.o_custkey = c.c_custkey",
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 100)
    val u = SynthData.uniformKeys(spark, 20000, 100)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
      top.toDouble / 20000
    }
    assert(topShare(z) > topShare(u) * 3)
  }
}

package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators through the DuckDB
  * oracle (the oracle pipeline itself is exercised heavily by the graph
  * suites; these keep the relational substrate honest too).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem aggregate (Q1-like) matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val agg = li.groupBy("l_returnflag", "l_linestatus")
      .agg(count(lit(1)).as("cnt"),
        round(sum(col("l_quantity")), 2).as("sum_qty"))
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, l_linestatus, count(*) AS cnt, " +
        "round(sum(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty " +
        "FROM lineitem GROUP BY l_returnflag, l_linestatus",
      "lineitem" -> li)
  }

  test("orders join customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val joined = o.join(c, col("o_custkey") === col("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(joined,
      "SELECT c_mktsegment, count(*) AS cnt FROM orders " +
        "JOIN customer ON o_custkey = c_custkey GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(zTop > 3 * uTop, s"zipf top=$zTop uniform top=$uTop")
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.toSeq === b.toSeq)
  }
}

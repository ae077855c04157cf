package repro

import org.apache.spark.sql.functions._

/** Keeps the provided TPC-H-lite generators and the DuckDB oracle plumbing
  * healthy (they back the DataFrame-op oracle tests), and pins the graph
  * entry point added for this paper.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem at tiny SF has the expected schema and row count") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.toSeq == Seq("l_orderkey", "l_partkey", "l_linenumber", "l_quantity",
      "l_extendedprice", "l_discount", "l_tax", "l_returnflag", "l_linestatus", "l_shipdate"))
    assert(li.count() == 6000L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    val b = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("oracle: aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: join between orders and customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.0005)
    val c = SynthData.customer(spark, 0.002)
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("SynthData.graph returns canonical edges for a dataset stand-in") {
    val e = SynthData.graph(spark, "rc")
    assert(e.columns.toSeq == Seq("src", "dst"))
    val bad = e.where(col("src") >= col("dst")).count()
    assert(bad == 0, "edges must be canonical src < dst")
    assert(e.count() == repro.gen.Datasets.byAbbr("rc").graph.edges.length.toLong)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .collect()(0).getLong(1)
      top / 20000.0
    }
    assert(topShare(z) > 5 * topShare(u), "zipf head must dominate uniform head")
  }
}

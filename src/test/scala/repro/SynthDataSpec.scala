package repro

import org.apache.spark.sql.functions._

/** Provided TPC-H-lite generators plus the probabilistic-graph extension:
  * determinism, schema sanity, and one DuckDB-oracle aggregation check.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001).agg(sum(col("l_quantity"))).head.getDouble(0)
    val b = SynthData.lineitem(spark, 0.001).agg(sum(col("l_quantity"))).head.getDouble(0)
    assert(a == b)
  }

  test("orders keys are dense 1..n") {
    val df = SynthData.orders(spark, 0.001)
    val n  = df.count()
    assert(df.agg(min(col("o_orderkey")), max(col("o_orderkey"))).head.toSeq == Seq(1L, n))
  }

  test("lineitem aggregate matches DuckDB oracle") {
    val li = SynthData.lineitem(spark, 0.001)
    val q  = li.groupBy(col("l_returnflag"))
      .agg(count(lit(1)).cast("double") as "cnt", sum(col("l_quantity")) as "qty")
    Oracle.assertEquivalent(q,
      """SELECT l_returnflag, CAST(COUNT(*) AS DOUBLE) AS cnt,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("probEdges produces a valid probabilistic edge list") {
    val df = SynthData.probEdges(spark, "krogan", scale = 0.1)
    assert(df.columns.toSeq == Seq("u", "v", "p"))
    val bad = df.filter(col("p") <= 0 || col("p") > 1 || col("u") >= col("v")).count()
    assert(bad == 0)
    assert(df.count() == SynthData.probEdges(spark, "krogan", scale = 0.1).count())
  }
}

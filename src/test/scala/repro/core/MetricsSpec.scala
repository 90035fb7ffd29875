package repro.core

import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, ProbGraph}
import org.apache.spark.sql.functions._

/** PD (Eq. 19) and PCC (Eq. 20): hand-computed cases, in-memory vs
  * DataFrame agreement, and a DuckDB oracle check of the dataflow pieces.
  */
class MetricsSpec extends SparkSpec {

  private val triangleGraph = ProbGraph(Seq((0L, 1L, 0.5), (1L, 2L, 0.6), (0L, 2L, 0.7)))

  test("PD of a triangle graph") {
    // (0.5+0.6+0.7) / 3 possible edges
    assert(math.abs(Metrics.pd(triangleGraph) - 1.8 / 3.0) < 1e-12)
  }

  test("PCC of a triangle graph") {
    val num = 3 * (0.5 * 0.6 * 0.7)
    val den = 0.5 * 0.7 + 0.5 * 0.6 + 0.6 * 0.7 // one wedge pair per centre
    assert(math.abs(Metrics.pcc(triangleGraph) - num / den) < 1e-12)
  }

  test("PCC of a wedge (no triangle) is 0; PD counts all pairs") {
    val wedge = ProbGraph(Seq((0L, 1L, 0.8), (1L, 2L, 0.9)))
    assert(Metrics.pcc(wedge) == 0.0)
    assert(math.abs(Metrics.pd(wedge) - 1.7 / 3.0) < 1e-12)
  }

  test("PD of a complete graph with p = 1 is 1; PCC is 1") {
    val k5 = ProbGraph(for { a <- 0 until 5; b <- a + 1 until 5 } yield (a.toLong, b.toLong, 1.0))
    assert(math.abs(Metrics.pd(k5) - 1.0) < 1e-12)
    assert(math.abs(Metrics.pcc(k5) - 1.0) < 1e-12)
  }

  test("in-memory and DataFrame metrics agree on dataset stand-ins") {
    for (name <- Seq("krogan", "flickr")) {
      val g  = GraphGen.dataset(name, scale = 0.1)
      val df = g.toDF(spark)
      assert(math.abs(Metrics.pd(g) - Metrics.pdDF(df)) < 1e-9, s"$name PD")
      assert(math.abs(Metrics.pcc(g) - Metrics.pccDF(df)) < 1e-9, s"$name PCC")
    }
  }

  test("PD ingredients match DuckDB oracle") {
    val g  = GraphGen.dataset("krogan", scale = 0.1)
    val df = g.toDF(spark)
    val sparkSide = df.agg(
      sum(col("p")) as "psum",
      count(lit(1)).cast("double") as "edges")
    Oracle.assertEquivalent(sparkSide,
      "SELECT SUM(CAST(p AS DOUBLE)) AS psum, CAST(COUNT(*) AS DOUBLE) AS edges FROM e",
      "e" -> df)
  }

  test("PCC numerator (triangle probability mass) matches DuckDB oracle") {
    val g  = GraphGen.dataset("krogan", scale = 0.12)
    val df = g.toDF(spark)
    val num = repro.cliques.Triangles.dataframe(df)
      .agg(coalesce(sum(col("pab") * col("pac") * col("pbc")), lit(0.0)) as "trimass")
    val sql =
      """SELECT COALESCE(SUM(CAST(e1.p AS DOUBLE) * CAST(e2.p AS DOUBLE) * CAST(e3.p AS DOUBLE)), 0.0) AS trimass
        |FROM e e1
        |JOIN e e2 ON CAST(e2.u AS BIGINT) = CAST(e1.v AS BIGINT)
        |JOIN e e3 ON CAST(e3.u AS BIGINT) = CAST(e1.u AS BIGINT)
        |         AND CAST(e3.v AS BIGINT) = CAST(e2.v AS BIGINT)""".stripMargin
    Oracle.assertEquivalent(num, sql, "e" -> df)
  }

  test("nucleus subgraphs are denser than their host graph") {
    val g   = GraphGen.dataset("krogan", scale = 0.3)
    val dec = LocalNucleus.decompose(g, 0.1, LocalNucleus.DP)
    if (dec.kMax >= 1) {
      val hostPd = Metrics.pd(g)
      dec.nucleiAt(dec.kMax).foreach { nuc =>
        val sub = ProbGraph(nuc.edges.toIndexedSeq.map { case (u, v, p) =>
          (g.labels(u), g.labels(v), p) })
        assert(Metrics.pd(sub) > hostPd, "max-k nucleus should beat host PD")
      }
    }
  }
}

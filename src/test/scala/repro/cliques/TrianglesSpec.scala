package repro.cliques

import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, ProbGraph}
import org.apache.spark.sql.functions._

/** Triangle enumeration: in-memory vs the distributed dataflow vs the
  * DuckDB oracle (SQL over the canonical edge table).
  */
class TrianglesSpec extends SparkSpec {

  private lazy val k4 = ProbGraph(Seq(
    (1L, 2L, 0.9), (1L, 3L, 0.8), (1L, 4L, 0.7),
    (2L, 3L, 0.6), (2L, 4L, 0.5), (3L, 4L, 0.4)))

  test("K4 has 4 triangles in-memory") {
    val t = Triangles.enumerate(k4)
    assert(t.size == 4)
    // triangle (1,2,3) has probability .9*.8*.6
    val idx = (0 until t.size).find(i => (t.u(i), t.v(i), t.w(i)) == (0, 1, 2)).get
    assert(math.abs(t.prob(idx) - 0.9 * 0.8 * 0.6) < 1e-12)
  }

  test("triangle-free graph (star) has none") {
    val star = ProbGraph(Seq((0L, 1L, 0.5), (0L, 2L, 0.5), (0L, 3L, 0.5)))
    assert(Triangles.count(star) == 0)
  }

  test("cycle C5 has no triangles; adding a chord creates one") {
    val c5 = ProbGraph(Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (2L, 3L, 1.0), (3L, 4L, 1.0), (4L, 0L, 1.0)))
    assert(Triangles.count(c5) == 0)
    val chord = ProbGraph(c5.edges.map { case (u, v, p) => (u.toLong, v.toLong, p) } :+ (0L, 2L, 1.0))
    assert(Triangles.count(chord) == 1)
  }

  private val triangleSql =
    """SELECT CAST(e1.u AS BIGINT) AS a, CAST(e1.v AS BIGINT) AS b, CAST(e2.v AS BIGINT) AS c,
      |       CAST(e1.p AS DOUBLE) AS pab, CAST(e3.p AS DOUBLE) AS pac, CAST(e2.p AS DOUBLE) AS pbc
      |FROM e e1
      |JOIN e e2 ON CAST(e2.u AS BIGINT) = CAST(e1.v AS BIGINT)
      |JOIN e e3 ON CAST(e3.u AS BIGINT) = CAST(e1.u AS BIGINT)
      |         AND CAST(e3.v AS BIGINT) = CAST(e2.v AS BIGINT)""".stripMargin

  test("dataframe enumeration matches DuckDB oracle on krogan stand-in") {
    val g  = GraphGen.dataset("krogan", scale = 0.15)
    val df = g.toDF(spark)
    Oracle.assertEquivalent(Triangles.dataframe(df), triangleSql, "e" -> df)
  }

  test("dataframe enumeration matches DuckDB oracle on a dense random graph") {
    val g  = GraphGen.graph(GraphGen.Spec(40, 250, Seq(8, 6), GraphGen.UniformDist(), seed = 21))
    val df = g.toDF(spark)
    Oracle.assertEquivalent(Triangles.dataframe(df), triangleSql, "e" -> df)
  }

  test("dataframe count equals in-memory count across datasets") {
    for (name <- Seq("krogan", "dblp", "flickr")) {
      val g = GraphGen.dataset(name, scale = 0.05)
      assert(Triangles.dataframe(g.toDF(spark)).count() == Triangles.count(g), name)
    }
  }

  test("dataframe probabilities are keyed to the right pair") {
    val g   = GraphGen.dataset("krogan", scale = 0.1)
    val df  = Triangles.dataframe(g.toDF(spark))
    val chk = df.collect()
    val lookup = g.edges.map { case (u, v, p) => ((g.labels(u), g.labels(v)), p) }.toMap
    chk.foreach { r =>
      val (a, b, c) = (r.getLong(0), r.getLong(1), r.getLong(2))
      assert(a < b && b < c)
      assert(math.abs(r.getDouble(3) - lookup((a, b))) < 1e-12)
      assert(math.abs(r.getDouble(4) - lookup((a, c))) < 1e-12)
      assert(math.abs(r.getDouble(5) - lookup((b, c))) < 1e-12)
    }
  }
}

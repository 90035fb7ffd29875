package repro.cliques

import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, ProbGraph}
import org.apache.spark.sql.functions._

/** 4-clique enumeration and the (triangle, Pr(E_i)) incidence structure:
  * known-count cases, internal identities, and DuckDB-oracle checks for the
  * distributed dataflow.
  */
class FourCliquesSpec extends SparkSpec {

  private def completeGraph(n: Int, p: Double = 0.9): ProbGraph =
    ProbGraph(for { a <- 0 until n; b <- a + 1 until n } yield (a.toLong, b.toLong, p))

  private def choose(n: Int, k: Int): Long =
    ((1 to k).map(i => (n - i + 1).toDouble / i).product).round

  test("K_n has C(n,4) 4-cliques and each triangle support n-3") {
    for (n <- 4 to 8) {
      val cs = FourCliques.build(completeGraph(n))
      assert(cs.nCliques == choose(n, 4), s"n=$n")
      assert(cs.nTriangles == choose(n, 3))
      (0 until cs.nTriangles).foreach(t => assert(cs.support(t) == n - 3))
    }
  }

  test("K4 minus an edge has no 4-clique but two triangles") {
    val g = ProbGraph(Seq(
      (0L, 1L, 0.5), (0L, 2L, 0.5), (0L, 3L, 0.5), (1L, 2L, 0.5), (1L, 3L, 0.5)))
    val cs = FourCliques.build(g)
    assert(cs.nCliques == 0 && cs.nTriangles == 2)
  }

  test("Pr(E_i) identity: prE(c,t) · Pr(t) = clique existence probability") {
    val g  = GraphGen.graph(GraphGen.Spec(30, 60, Seq(6, 5), GraphGen.UniformDist(), seed = 33))
    val cs = FourCliques.build(g)
    for (c <- 0 until cs.nCliques) {
      val members = cs.members(c)
      // all four member triangles must give the same 6-edge product
      val products = members.map(t => cs.prE(c, t) * cs.tris.prob(t))
      products.foreach(p => assert(math.abs(p - products.head) < 1e-12))
    }
  }

  test("triCliques is the inverse of cliqueTris") {
    val g  = GraphGen.dataset("krogan", scale = 0.15)
    val cs = FourCliques.build(g)
    for (t <- 0 until cs.nTriangles; c <- cs.triCliques(t))
      assert(cs.members(c).contains(t))
    var total = 0
    (0 until cs.nTriangles).foreach(t => total += cs.triCliques(t).length)
    assert(total == 4 * cs.nCliques)
  }

  private val cliqueCountSql =
    """SELECT COUNT(*) AS cnt FROM
      |(SELECT 1 FROM e e1
      | JOIN e e2 ON CAST(e2.u AS BIGINT) = CAST(e1.v AS BIGINT)
      | JOIN e e3 ON CAST(e3.u AS BIGINT) = CAST(e1.u AS BIGINT)
      |          AND CAST(e3.v AS BIGINT) = CAST(e2.v AS BIGINT)
      | JOIN e e4 ON CAST(e4.u AS BIGINT) = CAST(e2.v AS BIGINT)
      | JOIN e e5 ON CAST(e5.u AS BIGINT) = CAST(e1.v AS BIGINT)
      |          AND CAST(e5.v AS BIGINT) = CAST(e4.v AS BIGINT)
      | JOIN e e6 ON CAST(e6.u AS BIGINT) = CAST(e1.u AS BIGINT)
      |          AND CAST(e6.v AS BIGINT) = CAST(e4.v AS BIGINT))""".stripMargin

  test("dataframe 4-clique count matches DuckDB oracle (krogan stand-in)") {
    val g  = GraphGen.dataset("krogan", scale = 0.15)
    val df = g.toDF(spark)
    val cnt = FourCliques.dataframe(df).agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(cnt, cliqueCountSql, "e" -> df)
  }

  test("dataframe matches in-memory build (counts and per-triangle support)") {
    val g  = GraphGen.graph(GraphGen.Spec(40, 150, Seq(7, 6, 5), GraphGen.UniformDist(), seed = 55))
    val cs = FourCliques.build(g)
    val df = FourCliques.dataframe(g.toDF(spark))
    assert(df.count() == cs.nCliques)
    // incidence support per triangle
    val inc = FourCliques.incidence(g.toDF(spark))
      .groupBy("x", "y", "z").agg(count(lit(1)) as "s").collect()
      .map(r => ((r.getLong(0), r.getLong(1), r.getLong(2)), r.getLong(3))).toMap
    for (t <- 0 until cs.nTriangles) {
      val key = (g.labels(cs.tris.u(t)), g.labels(cs.tris.v(t)), g.labels(cs.tris.w(t)))
      assert(inc.getOrElse(key, 0L) == cs.support(t), s"triangle $key")
    }
  }

  test("incidence prE values match in-memory structure") {
    val g  = GraphGen.graph(GraphGen.Spec(25, 60, Seq(6, 5), GraphGen.UniformDist(), seed = 66))
    val cs = FourCliques.build(g)
    val inc = FourCliques.incidence(g.toDF(spark)).collect()
      .groupBy(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
      .view.mapValues(_.map(_.getDouble(3)).sorted.toSeq).toMap
    for (t <- 0 until cs.nTriangles if cs.support(t) > 0) {
      val key  = (g.labels(cs.tris.u(t)), g.labels(cs.tris.v(t)), g.labels(cs.tris.w(t)))
      val mine = cs.triCliques(t).map(c => cs.prE(c, t)).sorted.toSeq
      val dfs  = inc(key)
      assert(mine.size == dfs.size)
      mine.zip(dfs).foreach { case (a, b) => assert(math.abs(a - b) < 1e-12) }
    }
  }

  test("planted 6-clique yields expected counts in sparse background") {
    val g  = GraphGen.graph(GraphGen.Spec(100, 0, Seq(6), GraphGen.UniformDist(), seed = 1, overlapFraction = 0))
    val cs = FourCliques.build(g)
    assert(cs.nCliques == choose(6, 4))
    assert(cs.nTriangles == choose(6, 3))
  }
}

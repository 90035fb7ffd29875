package repro.core

import repro.SparkSpec
import repro.cliques.FourCliques
import repro.graph.GraphGen

/** Distributed initial-κ scoring: the Spark dataflow must agree triangle-
  * by-triangle with the in-memory kernel's initial scores, for both DP and
  * AP scorers.
  */
class NucleusScoresSpec extends SparkSpec {

  private def check(name: String, scale: Double, theta: Double, mode: LocalNucleus.Mode): Unit = {
    val g  = GraphGen.dataset(name, scale)
    val cs = FourCliques.build(g)
    val inMem = {
      val in = LocalNucleus.kernelInput(cs)
      ProbPeeling.peel(in, theta, LocalNucleus.scorer(mode)).initialKappa
    }
    val df = NucleusScores.initialKappa(g.toDF(spark), theta, mode).collect()
      .map(r => ((r.getLong(0), r.getLong(1), r.getLong(2)), (r.getLong(3), r.getInt(5))))
      .toMap
    assert(df.size == cs.nTriangles)
    for (t <- 0 until cs.nTriangles) {
      val key = (g.labels(cs.tris.u(t)), g.labels(cs.tris.v(t)), g.labels(cs.tris.w(t)))
      val (support, kappa) = df(key)
      assert(support == cs.support(t), s"$name support of $key")
      assert(kappa == inMem(t), s"$name κ of $key (mode $mode)")
    }
  }

  test("distributed DP κ matches the kernel on krogan (θ = 0.2)") {
    check("krogan", 0.2, 0.2, LocalNucleus.DP)
  }

  test("distributed DP κ matches the kernel on flickr (θ = 0.1)") {
    check("flickr", 0.05, 0.1, LocalNucleus.DP)
  }

  test("distributed AP κ matches the kernel on krogan (θ = 0.3)") {
    check("krogan", 0.2, 0.3, LocalNucleus.AP)
  }

  test("distributed AP κ matches the kernel on dblp (θ = 0.2)") {
    check("dblp", 0.05, 0.2, LocalNucleus.AP)
  }

  test("triangles with no 4-clique get support 0 and κ ∈ {-1, 0}") {
    val g  = GraphGen.dataset("dblp", 0.03)
    val df = NucleusScores.initialKappa(g.toDF(spark), 0.2, LocalNucleus.DP)
    val zeroSupport = df.filter("support = 0").collect()
    zeroSupport.foreach(r => assert(r.getInt(5) == 0 || r.getInt(5) == -1))
  }
}

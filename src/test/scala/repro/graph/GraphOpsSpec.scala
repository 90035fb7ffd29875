package repro.graph

import repro.SparkSpec

/** Table 1 statistics: in-memory vs the distributed dataflow. */
class GraphOpsSpec extends SparkSpec {

  test("stats of a known graph") {
    val g = ProbGraph(Seq((0L, 1L, 0.5), (1L, 2L, 0.7), (0L, 2L, 0.9), (2L, 3L, 0.1)))
    val s = GraphOps.stats(g)
    assert(s.nVertices == 4 && s.nEdges == 4)
    assert(s.dMax == 3) // vertex 2
    assert(math.abs(s.pAvg - 0.55) < 1e-12)
    assert(s.nTriangles == 1)
  }

  test("in-memory and DataFrame stats agree on stand-ins") {
    for (name <- Seq("krogan", "dblp")) {
      val g  = GraphGen.dataset(name, scale = 0.08)
      val mem = GraphOps.stats(g)
      val df  = GraphOps.statsDF(g.toDF(spark))
      assert(mem.nVertices == df.nVertices && mem.nEdges == df.nEdges &&
             mem.dMax == df.dMax && mem.nTriangles == df.nTriangles, name)
      assert(math.abs(mem.pAvg - df.pAvg) < 1e-9, name) // summation order differs
    }
  }

  test("isolated-free invariant: every counted vertex has degree ≥ 1") {
    val g = GraphGen.dataset("flickr", scale = 0.05)
    (0 until g.n).foreach(v => assert(g.degree(v) >= 1))
  }
}

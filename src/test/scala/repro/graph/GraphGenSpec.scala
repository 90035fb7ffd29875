package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class GraphGenSpec extends AnyFunSuite {
  import GraphGen._

  test("generation is deterministic in the seed") {
    val spec = Spec(100, 200, Seq(5, 6), UniformDist(), seed = 9)
    assert(generate(spec) == generate(spec))
    val other = generate(spec.copy(seed = 10))
    assert(generate(spec) != other)
  }

  test("planted cliques are present as complete subgraphs") {
    val spec = Spec(50, 0, Seq(6), UniformDist(), seed = 3, overlapFraction = 0.0)
    val g    = graph(spec)
    // with no background and no overlap the first 6 vertices form a clique
    for (a <- 0 until 6; b <- a + 1 until 6)
      assert(g.hasEdge(a, b), s"missing clique edge $a-$b")
  }

  test("all probabilities are in (0,1]") {
    for (name <- paperDatasets) {
      val g = dataset(name, scale = 0.05)
      g.edges.foreach { case (_, _, p) => assert(p > 0 && p <= 1) }
    }
  }

  test("probability distributions have roughly the intended averages") {
    val rnd = new Random(5)
    def avg(d: ProbDist, n: Int = 20000): Double = (1 to n).map(_ => d.sample(rnd)).sum / n
    assert(math.abs(avg(UniformDist()) - 0.5) < 0.02)
    assert(math.abs(avg(NormalDist(0.68, 0.15)) - 0.68) < 0.02)
    assert(avg(ParetoDist(0.05, 2.0)) < 0.2) // concentrated small
    assert(math.abs(avg(SkewedSmallDist(0.13)) - 0.13) < 0.03)
    val ec = avg(ExpCollabDist(0.6))
    assert(ec > 0.2 && ec < 0.4, s"exp-collab avg $ec") // skewed toward 1-exp(-1/4)≈0.22
  }

  test("dataset sizes are ordered like the paper's (by edge count)") {
    val sizes = Seq("krogan", "dblp", "flickr", "pokec", "biomine", "ljournal")
      .map(d => d -> dataset(d, scale = 0.1).m).toMap
    assert(sizes("krogan") < sizes("dblp"))
    assert(sizes("pokec") > sizes("flickr"))
    assert(sizes("ljournal") > sizes("biomine"))
  }

  test("unknown dataset name rejected") {
    intercept[IllegalArgumentException](dataset("nope"))
  }

  test("scaled datasets shrink") {
    val full  = dataset("krogan", 0.5)
    val small = dataset("krogan", 0.1)
    assert(small.m < full.m && small.n <= full.n)
  }

  test("pokec variants share topology but differ in probabilities") {
    val u = dataset("pokec", 0.05)
    val n = dataset("pokec_Normal", 0.05)
    assert(u.m == n.m && u.n == n.n)
    val uEdges = u.edges.map { case (a, b, _) => (a, b) }.toSeq
    val nEdges = n.edges.map { case (a, b, _) => (a, b) }.toSeq
    assert(uEdges == nEdges)
    assert(u.edges.map(_._3).toSeq != n.edges.map(_._3).toSeq)
  }
}

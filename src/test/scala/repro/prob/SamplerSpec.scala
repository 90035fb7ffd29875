package repro.prob

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.ProbGraph
import scala.util.Random

/** Possible-world sampling: Hoeffding bound arithmetic, determinism, and
  * distributional correctness.
  */
class SamplerSpec extends AnyFunSuite {

  private val g = ProbGraph(Seq((0L, 1L, 0.5), (1L, 2L, 0.25), (0L, 2L, 1.0)))

  test("Hoeffding bound values") {
    assert(Sampler.hoeffdingSamples(0.1, 0.1) == 150)
    assert(Sampler.hoeffdingSamples(0.05, 0.05) == 738)
    assert(Sampler.hoeffdingSamples(0.03, 0.05) == 2050)
  }

  test("sampling is deterministic in the seed") {
    val a = Sampler.sampleWorlds(g, 20, seed = 5).map(_.m)
    val b = Sampler.sampleWorlds(g, 20, seed = 5).map(_.m)
    assert(a == b)
    val c = Sampler.sampleWorlds(g, 20, seed = 6).map(_.m)
    assert(a != c || a.sum == 60) // different seed differs unless saturated
  }

  test("certain edges always appear; per-edge frequency tracks probability") {
    val edges  = g.edges
    val rnd    = new Random(42)
    val n      = 4000
    val counts = new Array[Int](edges.length)
    for (_ <- 1 to n) {
      val mask = Sampler.sampleMask(edges, rnd)
      mask.zipWithIndex.foreach { case (b, i) => if (b) counts(i) += 1 }
    }
    edges.zipWithIndex.foreach { case ((_, _, p), i) =>
      val freq = counts(i).toDouble / n
      assert(math.abs(freq - p) < 0.03, s"edge $i freq $freq vs p $p")
      if (p == 1.0) assert(counts(i) == n)
    }
  }

  test("world graphs keep original labels and set probabilities to 1") {
    val edges = g.edges
    val world = Sampler.worldGraph(g, edges, Array(true, false, true))
    assert(world.m == 2)
    world.edges.foreach { case (_, _, p) => assert(p == 1.0) }
    world.labels.foreach(l => assert(g.labels.contains(l)))
  }

  test("empty mask gives an empty world") {
    val world = Sampler.worldGraph(g, g.edges, Array(false, false, false))
    assert(world.n == 0 && world.m == 0)
  }
}

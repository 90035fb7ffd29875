package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.ProbGraph
import repro.prob.{BruteForce, Sampler}
import scala.util.Random

/** g-NuDecomp and w-NuDecomp (Algorithms 2 and 3): Monte-Carlo estimates
  * against exact possible-world enumeration on small graphs, and the
  * containment chain g ⊆ w ⊆ ℓ.
  */
class GlobalWeaklySpec extends AnyFunSuite {

  private def probK4(p: Double): ProbGraph =
    ProbGraph(for { a <- 0 until 4; b <- a + 1 until 4 } yield (a.toLong, b.toLong, p))

  test("Hoeffding sample bound matches the paper's n = 200 > bound at ε = δ = 0.1") {
    val n = Sampler.hoeffdingSamples(0.1, 0.1)
    assert(n == 150) // ⌈ln(20)/0.02⌉ = ⌈149.8⌉
    assert(200 > n)
  }

  test("sampled worlds follow edge probabilities (law of large numbers)") {
    val g     = probK4(0.7)
    val worlds = Sampler.sampleWorlds(g, 2000, seed = 8)
    val freq  = worlds.map(_.m).sum.toDouble / (2000 * 6)
    assert(math.abs(freq - 0.7) < 0.03, s"edge frequency $freq")
  }

  test("single K4: g and w tails match brute force (K4 world must be complete)") {
    val p = 0.9
    val g = probK4(p)
    // exact: a world is a 1-nucleus iff all 6 edges are present
    val exact = math.pow(p, 6)
    assert(math.abs(BruteForce.globalTail(g, 0, 1, 2, 1) - exact) < 1e-12)
    assert(math.abs(BruteForce.weaklyGlobalTail(g, 0, 1, 2, 1) - exact) < 1e-12)
  }

  test("g-NuDecomp accepts a high-probability K4 and reports a calibrated tail") {
    val p     = 0.95
    val g     = probK4(p)
    val local = LocalNucleus.decompose(g, theta = 0.3, LocalNucleus.DP)
    assert(local.kMax == 1)
    val nuclei = GlobalNucleus.decomposeAt(local, k = 1, nSamples = 800, seed = 5)
    assert(nuclei.size == 1)
    val exact = math.pow(p, 6) // ≈ 0.735
    assert(math.abs(nuclei.head.minTail - exact) < 0.06,
      s"MC tail ${nuclei.head.minTail} vs exact $exact")
    assert(nuclei.head.vertices.length == 4 && nuclei.head.edges.length == 6)
  }

  test("g-NuDecomp rejects when the exact tail is clearly below θ") {
    val p     = 0.6 // tail = 0.6^6 ≈ 0.047
    val g     = probK4(p)
    val local = LocalNucleus.decompose(g, theta = 0.04, LocalNucleus.DP)
    assert(local.kMax == 1)
    // θ = 0.4 for the global check is far above 0.047: must reject
    val strict = local.copy(theta = 0.4)
    assert(GlobalNucleus.decomposeAt(strict, 1, nSamples = 500, seed = 6).isEmpty)
  }

  test("w-NuDecomp matches brute force on a K4 + pendant-triangle graph") {
    // K4 on 0..3 with p = 0.9; a triangle (3,4,5) with p = 0.9 hangs off it
    val es = (for { a <- 0 until 4; b <- a + 1 until 4 } yield (a.toLong, b.toLong, 0.9)) ++
             Seq((3L, 4L, 0.9), (3L, 5L, 0.9), (4L, 5L, 0.9))
    val g     = ProbGraph(es)
    val local = LocalNucleus.decompose(g, theta = 0.3, LocalNucleus.DP)
    assert(local.kMax == 1)
    val ws = WeaklyGlobalNucleus.decomposeAt(local, 1, nSamples = 1000, seed = 7)
    // exact w-tail of a K4 triangle: all 6 K4 edges present = 0.9^6 ≈ 0.531
    val exact = math.pow(0.9, 6)
    assert(ws.size == 1)
    assert(math.abs(ws.head.minTail - exact) < 0.06)
    // the pendant triangle is not in any ℓ-(1,θ)-nucleus, so not in the output
    assert(!ws.head.vertices.contains(5L))
  }

  test("containment: every g-nucleus vertex/edge set is inside some w-nucleus, inside some ℓ-nucleus") {
    val rnd = new Random(909)
    for (trial <- 1 to 5) {
      val es = for { a <- 0 until 7; b <- a + 1 until 7 if rnd.nextDouble() < 0.8 }
        yield (a.toLong, b.toLong, 0.6 + rnd.nextDouble() * 0.4)
      val g     = ProbGraph(es)
      val local = LocalNucleus.decompose(g, theta = 0.2, LocalNucleus.DP)
      if (local.kMax >= 1) {
        for (k <- 1 to local.kMax) {
          val gs = GlobalNucleus.decomposeAt(local, k, 400, seed = trial)
          val ws = WeaklyGlobalNucleus.decomposeAt(local, k, 400, seed = trial)
          val lEdges = local.nucleiAt(k).map(_.edges.map { case (u, v, _) =>
            (g.labels(u), g.labels(v)) }.toSet)
          def contained(inner: Set[(Long, Long)], outers: Seq[Set[(Long, Long)]]) =
            inner.isEmpty || outers.exists(o => inner.subsetOf(o))
          gs.foreach { nucleus =>
            val ge = nucleus.edges.map { case (u, v, _) => (u, v) }.toSet
            assert(contained(ge, lEdges), s"trial $trial k=$k: g-nucleus outside ℓ-nuclei")
          }
          ws.foreach { nucleus =>
            val we = nucleus.edges.map { case (u, v, _) => (u, v) }.toSet
            assert(contained(we, lEdges), s"trial $trial k=$k: w-nucleus outside ℓ-nuclei")
          }
        }
      }
    }
  }

  test("w estimates are close to brute force per triangle (randomized)") {
    val rnd = new Random(303)
    for (trial <- 1 to 3) {
      val es = for { a <- 0 until 5; b <- a + 1 until 5 if rnd.nextDouble() < 0.95 }
        yield (a.toLong, b.toLong, 0.5 + rnd.nextDouble() * 0.5)
      val g = ProbGraph(es)
      if (g.edges.length <= 12) {
        val local = LocalNucleus.decompose(g, theta = 0.05, LocalNucleus.DP)
        for (k <- 1 to local.kMax) {
          val ws = WeaklyGlobalNucleus.decomposeAt(local, k, 1500, seed = 11 + trial)
          ws.foreach { nucleus =>
            // the reported min tail must be within MC tolerance of the exact
            // min over the nucleus's triangles
            val triples = for {
              i <- nucleus.vertices.indices; j <- i + 1 until nucleus.vertices.length
              l <- j + 1 until nucleus.vertices.length
              a = nucleus.vertices(i); b = nucleus.vertices(j); c = nucleus.vertices(l)
              if GlobalNucleus.containsTriangle(nucleus.toGraph,
                a, b, c)
            } yield (a, b, c)
            // the nucleus's triangles are a subset of all triples formed by
            // its edges, so its MC min-tail must be ≥ the exact min over all
            // triples (up to MC tolerance), and ≤ the exact max likewise
            val exacts = triples.map { case (a, b, c) =>
              BruteForce.weaklyGlobalTail(g, a, b, c, k) }
            assert(nucleus.minTail >= exacts.min - 0.1,
              s"trial $trial k=$k: MC ${nucleus.minTail} vs exact min ${exacts.min}")
            assert(nucleus.minTail <= exacts.max + 0.1,
              s"trial $trial k=$k: MC ${nucleus.minTail} vs exact max ${exacts.max}")
          }
        }
      }
    }
  }
}

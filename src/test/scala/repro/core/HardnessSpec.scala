package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.ProbGraph
import repro.prob.BruteForce
import scala.util.Random

/** Section 4's hardness results are proofs; here we validate their
  * constructive gadgets executably: the reliability gadget of Lemma 2 and
  * the k-clique reduction of Theorem 4.2 (via Lemma 3).
  */
class HardnessSpec extends AnyFunSuite {

  /** Exact reliability of a probabilistic graph over its full vertex set:
    * Σ over worlds of Pr(world)·[world connected], counting vertices with
    * no incident sampled edge as disconnecting (Valiant's semantics).
    */
  private def reliability(edges: Seq[(Int, Int, Double)], nVertices: Int): Double = {
    val m = edges.length
    var total = 0.0
    for (bits <- 0 until (1 << m)) {
      var pr = 1.0
      val parent = Array.tabulate(nVertices)(identity)
      def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); r }
      var kept = 0
      for (i <- 0 until m) {
        val (u, v, p) = edges(i)
        if (((bits >> i) & 1) == 1) { pr *= p; parent(find(u)) = find(v); kept += 1 }
        else pr *= 1 - p
      }
      val connected = (0 until nVertices).map(find).distinct.size == 1
      if (connected) total += pr
    }
    total
  }

  /** Lemma 2's combinatorial core: attach a probability-1 triangle gadget
    * (v, u, w) to vertex v; a world of the extended graph F is connected
    * iff the corresponding world of G is connected.
    */
  test("Lemma 2 gadget: connectivity of F-worlds tracks connectivity of G-worlds") {
    val rnd = new Random(77)
    for (trial <- 1 to 10) {
      val n = 4 + rnd.nextInt(2)
      val edges = (for { a <- 0 until n; b <- a + 1 until n if rnd.nextDouble() < 0.6 }
        yield (a, b, 0.2 + rnd.nextDouble() * 0.8)).toSeq
      if (edges.nonEmpty && edges.length <= 10) {
        val v = 0
        val u = n; val w = n + 1 // gadget vertices
        val fEdges = edges ++ Seq((u, v, 1.0), (u, w, 1.0), (v, w, 1.0))
        val relG = reliability(edges, n)
        val relF = reliability(fEdges, n + 2)
        assert(math.abs(relG - relF) < 1e-9, s"trial $trial")
      }
    }
  }

  /** Theorem 4.2 construction: with p(e) = 1/(2^{2m}+1) and
    * θ = p^{(k+3)(k+2)/2}, a triangle has w-tail ≥ θ iff the deterministic
    * graph contains a (k+3)-clique through it.
    */
  test("Theorem 4.2 gadget: w-tail crosses θ exactly when a (k+3)-clique exists") {
    val k = 1 // (k+3)-clique = K4
    // graph WITH a K4 (plus a distractor edge)
    val withK4 = Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3), (3, 4))
    // graph WITHOUT any K4 (K4 minus an edge, plus distractors)
    val withoutK4 = Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 4), (3, 4))

    def check(det: Seq[(Int, Int)], expectNucleus: Boolean): Unit = {
      val m     = det.length
      val p     = 1.0 / (math.pow(2.0, 2.0 * m) + 1.0)
      val theta = math.pow(p, (k + 3) * (k + 2) / 2.0)
      val g     = ProbGraph(det.map { case (a, b) => (a.toLong, b.toLong, p) })
      // any triangle achieving the w-tail threshold?
      val triples = for {
        a <- g.labels.indices; b <- a + 1 until g.n; c <- b + 1 until g.n
        if g.hasEdge(a, b) && g.hasEdge(a, c) && g.hasEdge(b, c)
      } yield (g.labels(a), g.labels(b), g.labels(c))
      val reached = triples.exists { case (a, b, c) =>
        BruteForce.weaklyGlobalTail(g, a, b, c, k) >= theta - 1e-30
      }
      assert(reached == expectNucleus, s"graph=$det")
    }
    check(withK4, expectNucleus = true)
    check(withoutK4, expectNucleus = false)
  }

  test("Lemma 3 boundary: K_{k+3} w-tail equals exactly p^{(k+3)(k+2)/2}") {
    val k = 1
    val p = 0.5
    val g = ProbGraph(for { a <- 0 until 4; b <- a + 1 until 4 } yield (a.toLong, b.toLong, p))
    val tail = BruteForce.weaklyGlobalTail(g, 0, 1, 2, k)
    assert(math.abs(tail - math.pow(p, 6)) < 1e-12)
  }
}

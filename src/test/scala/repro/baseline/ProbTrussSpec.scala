package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.ProbGraph
import scala.util.Random

/** Probabilistic local (k,γ)-truss (Huang et al.): deterministic degeneracy
  * vs a reference support-peeling truss, and structural checks.
  */
class ProbTrussSpec extends AnyFunSuite {

  /** Reference deterministic truss: edge score = max k such that the edge
    * survives peeling edges with < k triangles (triangle support counted in
    * the surviving subgraph).
    */
  private def referenceTruss(edges: Seq[(Int, Int)]): Map[(Int, Int), Int] = {
    var k = 0
    val score = scala.collection.mutable.Map.empty[(Int, Int), Int]
    var current = edges.toSet
    while (current.nonEmpty) {
      var changed = true
      while (changed) {
        changed = false
        def support(e: (Int, Int)): Int = {
          val (u, v) = e
          val vs = current.flatMap { case (a, b) => Seq(a, b) }
          vs.count(w => w != u && w != v &&
            current((math.min(u, w), math.max(u, w))) &&
            current((math.min(v, w), math.max(v, w))))
        }
        val drop = current.filter(e => support(e) < k)
        if (drop.nonEmpty) {
          changed = true
          current --= drop
        }
      }
      current.foreach(e => score(e) = k)
      k += 1
      if (k > 60) current = Set.empty
    }
    score.toMap
  }

  test("all-certain graph reduces to classic truss decomposition") {
    val rnd = new Random(41)
    for (trial <- 1 to 10) {
      val n = 7 + rnd.nextInt(8)
      val pairs = for { a <- 0 until n; b <- a + 1 until n if rnd.nextDouble() < 0.45 } yield (a, b)
      if (pairs.nonEmpty) {
        val g   = ProbGraph(pairs.map { case (a, b) => (a.toLong, b.toLong, 1.0) })
        val dec = ProbTruss.decompose(g, gamma = 0.5)
        val ref = referenceTruss(g.edges.map { case (u, v, _) => (u, v) }.toSeq)
        dec.edgeList.zipWithIndex.foreach { case ((u, v, _), i) =>
          assert(dec.trussNumber(i) == ref((u, v)), s"trial $trial edge ($u,$v)")
        }
      }
    }
  }

  test("K4 with uniform probability: every edge gets the same truss number") {
    val g   = ProbGraph(for { a <- 0 until 4; b <- a + 1 until 4 } yield (a.toLong, b.toLong, 0.9))
    val dec = ProbTruss.decompose(g, gamma = 0.2)
    assert(dec.trussNumber.distinct.length == 1)
    assert(dec.kMax >= 1)
  }

  test("triangle-free graph: all truss numbers 0") {
    val g   = ProbGraph(Seq((0L, 1L, 0.9), (1L, 2L, 0.9), (2L, 3L, 0.9)))
    val dec = ProbTruss.decompose(g, gamma = 0.1)
    assert(dec.trussNumber.forall(_ == 0))
  }

  test("higher γ gives pointwise smaller truss numbers") {
    val rnd = new Random(42)
    val es = for { a <- 0 until 12; b <- a + 1 until 12 if rnd.nextDouble() < 0.5 }
      yield (a.toLong, b.toLong, 0.4 + rnd.nextDouble() * 0.6)
    val g  = ProbGraph(es)
    val lo = ProbTruss.decompose(g, 0.05)
    val hi = ProbTruss.decompose(g, 0.5)
    lo.trussNumber.indices.foreach(e => assert(hi.trussNumber(e) <= lo.trussNumber(e)))
  }

  test("trussesAt(kMax) of two certain K4s bridged by an edge gives two K4s") {
    val es = (for { a <- 0 until 4; b <- a + 1 until 4 } yield (a.toLong, b.toLong, 0.95)) ++
             (for { a <- 10 until 14; b <- a + 1 until 14 } yield (a.toLong, b.toLong, 0.95)) ++
             Seq((3L, 10L, 0.9))
    val dec = ProbTruss.decompose(ProbGraph(es), gamma = 0.2)
    val ts  = dec.trussesAt(dec.kMax)
    assert(ts.size == 2)
    ts.foreach(t => assert(t.n == 4 && t.m == 6))
  }
}

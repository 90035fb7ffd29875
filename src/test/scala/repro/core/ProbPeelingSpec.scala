package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.prob.PoissonBinomial
import scala.util.Random

/** The generic peeling kernel, exercised on its deterministic degenerate
  * instance (classic k-core peeling: all probabilities 1, κ = alive group
  * count) where ground truth is easy to compute independently.
  */
class ProbPeelingSpec extends AnyFunSuite {

  /** Build the vertex/edge kernel input of a deterministic graph. */
  private def coreInput(n: Int, edges: Seq[(Int, Int)]): ProbPeeling.Input = {
    val groupItems = edges.map { case (u, v) => Array(u, v) }.toArray
    val groupPrE   = edges.map(_ => Array(1.0, 1.0)).toArray
    val itemGroups = Array.fill(n)(Array.newBuilder[Int])
    edges.zipWithIndex.foreach { case ((u, v), i) => itemGroups(u) += i; itemGroups(v) += i }
    ProbPeeling.Input(Array.fill(n)(1.0), groupItems, groupPrE, itemGroups.map(_.result()))
  }

  private val countScorer: ProbPeeling.Scorer = (p, probs, th) => probs.length

  /** Reference k-core via repeated deletion. */
  private def coreNumbers(n: Int, edges: Seq[(Int, Int)]): Array[Int] = {
    val alive = Array.fill(n)(true)
    val deg   = new Array[Int](n)
    edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val core = new Array[Int](n)
    var k = 0
    var remaining = n
    while (remaining > 0) {
      val peelable = (0 until n).filter(v => alive(v) && deg(v) <= k)
      if (peelable.isEmpty) k += 1
      else peelable.foreach { v =>
        core(v) = k; alive(v) = false; remaining -= 1
        edges.foreach { case (a, b) =>
          if (a == v && alive(b)) deg(b) -= 1
          if (b == v && alive(a)) deg(a) -= 1
        }
      }
    }
    core
  }

  test("deterministic degenerate case = classic k-core on a known graph") {
    // two triangles sharing a vertex + a pendant
    val edges = Seq((0, 1), (1, 2), (0, 2), (2, 3), (3, 4), (2, 4), (4, 5))
    val res = ProbPeeling.peel(coreInput(6, edges), 0.5, countScorer)
    assert(res.nu.toSeq == coreNumbers(6, edges).toSeq)
  }

  test("deterministic degenerate case matches reference on random graphs") {
    val rnd = new Random(42)
    for (trial <- 1 to 25) {
      val n = 8 + rnd.nextInt(15)
      val edges = (for {
        u <- 0 until n; v <- u + 1 until n if rnd.nextDouble() < 0.3
      } yield (u, v))
      val res = ProbPeeling.peel(coreInput(n, edges), 0.5, countScorer)
      assert(res.nu.toSeq == coreNumbers(n, edges).toSeq, s"trial $trial")
    }
  }

  test("clamping: ν values are non-decreasing in processing order") {
    val rnd = new Random(43)
    for (_ <- 1 to 20) {
      val n = 10 + rnd.nextInt(10)
      val edges = (for {
        u <- 0 until n; v <- u + 1 until n if rnd.nextDouble() < 0.4
      } yield (u, v))
      val in  = coreInput(n, edges).copy(
        groupPrE = edges.map(_ => Array(rnd.nextDouble().max(0.1), rnd.nextDouble().max(0.1))).toArray)
      val res = ProbPeeling.peel(in, 0.3,
        (p, probs, th) => PoissonBinomial.kappaFast(p, probs, th))
      val nus = res.order.map(res.nu)
      nus.sliding(2).foreach { case Array(a, b) => assert(a <= b); case _ => }
    }
  }

  test("initial κ of an isolated item is its scorer value on no groups") {
    val in = ProbPeeling.Input(Array(1.0, 0.2), Array.empty, Array.empty, Array(Array.empty, Array.empty))
    val res = ProbPeeling.peel(in, 0.5,
      (p, probs, th) => PoissonBinomial.kappaFast(p, probs, th))
    assert(res.nu.toSeq == Seq(0, -1)) // second item exists with prob < θ
  }

  test("all items processed exactly once") {
    val edges = Seq((0, 1), (1, 2), (0, 2))
    val res = ProbPeeling.peel(coreInput(3, edges), 0.5, countScorer)
    assert(res.order.sorted.toSeq == Seq(0, 1, 2))
  }
}

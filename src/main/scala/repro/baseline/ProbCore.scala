package repro.baseline

import repro.core.ProbPeeling
import repro.graph.ProbGraph
import repro.prob.PoissonBinomial
import scala.collection.mutable

/** Probabilistic (k,η)-core decomposition (Bonchi et al., KDD 2014) — the
  * first baseline of Section 7.4. The η-degree of a vertex v is the largest
  * k with Pr[deg(v) ≥ k] ≥ η, a Poisson-binomial tail over the incident
  * edge probabilities; peeling the minimum η-degree vertex yields the core
  * number per vertex. Expressed as an instance of the shared kernel: items
  * are vertices (existence probability 1), groups are edges (a group dies
  * when either endpoint is peeled).
  */
object ProbCore {

  final case class Decomposition(graph: ProbGraph, eta: Double, coreNumber: Array[Int]) {
    def kMax: Int = if (coreNumber.isEmpty) 0 else math.max(0, coreNumber.max)

    /** Connected components of the subgraph induced by vertices with core
      * number ≥ k (the (k,η)-cores).
      */
    def coresAt(k: Int): Seq[ProbGraph] = {
      val keep  = (0 until graph.n).filter(coreNumber(_) >= k).toSet
      components(graph, keep)
    }
  }

  def decompose(g: ProbGraph, eta: Double): Decomposition = {
    val edges      = g.edges
    val groupItems = new Array[Array[Int]](edges.length)
    val groupPrE   = new Array[Array[Double]](edges.length)
    val degCount   = new Array[Int](g.n)
    edges.foreach { case (u, v, _) => degCount(u) += 1; degCount(v) += 1 }
    val itemGroups = Array.tabulate(g.n)(v => new Array[Int](degCount(v)))
    val cursor     = new Array[Int](g.n)
    var i = 0
    while (i < edges.length) {
      val (u, v, p) = edges(i)
      groupItems(i) = Array(u, v)
      groupPrE(i)   = Array(p, p)
      itemGroups(u)(cursor(u)) = i; cursor(u) += 1
      itemGroups(v)(cursor(v)) = i; cursor(v) += 1
      i += 1
    }
    val in  = ProbPeeling.Input(Array.fill(g.n)(1.0), groupItems, groupPrE, itemGroups)
    val res = ProbPeeling.peel(in, eta, (p, probs, th) => PoissonBinomial.kappaFast(p, probs, th))
    Decomposition(g, eta, res.nu)
  }

  /** Connected components of the induced subgraph on `keep`, as labeled
    * probabilistic subgraphs (isolated vertices dropped).
    */
  private[baseline] def components(g: ProbGraph, keep: Set[Int]): Seq[ProbGraph] = {
    val parent = mutable.HashMap.empty[Int, Int]
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); r }
    keep.foreach(v => parent(v) = v)
    val kept = g.edges.filter { case (u, v, _) => keep(u) && keep(v) }
    kept.foreach { case (u, v, _) => val (ru, rv) = (find(u), find(v)); if (ru != rv) parent(ru) = rv }
    kept.groupBy { case (u, _, _) => find(u) }.values.toSeq.map { es =>
      ProbGraph(es.toIndexedSeq.map { case (u, v, p) => (g.labels(u), g.labels(v), p) })
    }
  }
}

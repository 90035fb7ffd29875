package repro.core

import repro.cliques.FourCliques
import repro.graph.ProbGraph

/** Deterministic (3,4)-nucleus decomposition (Definition 3, [47]) — the
  * substrate the global / weakly-global algorithms decompose each sampled
  * possible world with, and the k = ∞-probability degenerate case of the
  * probabilistic kernel (all probabilities 1, κ = alive 4-clique count).
  */
object DetNucleus {

  /** ν_det per triangle of `g` (edge probabilities ignored): the largest k
    * such that the triangle belongs to a deterministic k-(3,4)-nucleus.
    * Triangles in no 4-clique get ν_det = 0.
    */
  def decompose(g: ProbGraph): (FourCliques.CliqueStructure, Array[Int]) = {
    val cs = FourCliques.build(g)
    val in = {
      val base = LocalNucleus.kernelInput(cs)
      base.copy(
        itemProb = Array.fill(base.nItems)(1.0),
        groupPrE = base.groupPrE.map(arr => Array.fill(arr.length)(1.0))
      )
    }
    // with all probabilities 1, Pr[ζ ≥ k] = 1 for k ≤ c: κ = alive count
    val res = ProbPeeling.peel(in, 0.5, (p, probs, th) => probs.length)
    (cs, res.nu)
  }

  /** Is the whole graph `g` (probabilities ignored) a deterministic
    * k-nucleus? Checks Definition 3: (1) every edge lies in a 4-clique,
    * (2) every triangle has 4-clique support ≥ k, (3) all triangles are
    * s-connected (share-a-4-clique connectivity), and that the graph has no
    * isolated vertices outside the clique union (it is "a union of
    * s-cliques"). The empty graph is not a nucleus.
    */
  def isKNucleus(g: ProbGraph, k: Int): Boolean = {
    if (g.m == 0) return false
    val cs = FourCliques.build(g)
    if (cs.nCliques == 0) return false
    // (2) support ≥ k for every triangle
    var t = 0
    while (t < cs.nTriangles) {
      if (cs.support(t) < k) return false
      t += 1
    }
    // (1) every edge in a 4-clique ⇔ every edge in a triangle that is in a
    // clique; collect covered edges from triangles in ≥1 clique — but with
    // support ≥ k ≥ 0 checked above, any triangle with 0 cliques fails for
    // k ≥ 1; for k = 0 a triangle outside all cliques breaks cliqueness.
    val coveredEdges = scala.collection.mutable.HashSet.empty[(Int, Int)]
    t = 0
    while (t < cs.nTriangles) {
      if (cs.support(t) > 0) {
        coveredEdges += ((cs.tris.u(t), cs.tris.v(t)))
        coveredEdges += ((cs.tris.u(t), cs.tris.w(t)))
        coveredEdges += ((cs.tris.v(t), cs.tris.w(t)))
      }
      t += 1
    }
    if (coveredEdges.size != g.m) return false
    // (3) s-connectivity of triangles via shared 4-cliques
    val parent = Array.tabulate(cs.nTriangles)(identity)
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); r }
    var c = 0
    while (c < cs.nCliques) {
      val r = find(cs.cliqueTris(4 * c))
      var i = 4 * c + 1
      while (i < 4 * c + 4) { parent(find(cs.cliqueTris(i))) = r; i += 1 }
      c += 1
    }
    val roots = (0 until cs.nTriangles).filter(t0 => cs.support(t0) > 0).map(find).distinct
    roots.size == 1
  }
}

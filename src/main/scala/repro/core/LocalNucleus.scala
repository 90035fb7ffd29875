package repro.core

import repro.cliques.FourCliques
import repro.cliques.FourCliques.CliqueStructure
import repro.graph.ProbGraph
import repro.prob.{Approximations, PoissonBinomial}
import scala.collection.mutable

/** ℓ-NuDecomp (Section 5, Algorithm 1): probabilistic local (3,4)-nucleus
  * decomposition by triangle peeling.
  *
  * Scores come either from the exact dynamic program (mode [[DP]]) or the
  * hybrid statistical approximation (mode [[AP]], Section 5.3). The output
  * assigns every triangle its nucleusness ν and materialises the
  * ℓ-(k,θ)-nuclei for every k.
  */
object LocalNucleus {

  sealed trait Mode
  /** Exact dynamic programming (Section 5.1/5.2). */
  case object DP extends Mode
  /** Hybrid statistical approximation with DP fallback (Section 5.3). */
  case object AP extends Mode

  /** One ℓ-(k,θ)-nucleus: a connected (via shared 4-cliques) set of
    * triangles of nucleusness ≥ k, materialised as a probabilistic subgraph.
    */
  final case class Nucleus(
      k: Int,
      triangleIds: Array[Int],
      vertices: Array[Int],
      /** canonical (u < v) edges with probabilities, from the input graph */
      edges: Array[(Int, Int, Double)]
  ) {
    def nVertices: Int = vertices.length
    def nEdges: Int    = edges.length
  }

  /** Full decomposition result. */
  final case class Decomposition(
      graph: ProbGraph,
      structure: CliqueStructure,
      theta: Double,
      /** ν per triangle; −1 = triangle exists with probability < θ */
      nu: Array[Int],
      initialKappa: Array[Int]
  ) {
    lazy val kMax: Int = if (nu.isEmpty) 0 else math.max(0, nu.max)

    /** All ℓ-(k,θ)-nuclei for one k (k ≥ 0). */
    def nucleiAt(k: Int): Seq[Nucleus] = buildNuclei(this, k)

    /** All nuclei for all k in 1..kMax. */
    def allNuclei: Seq[Nucleus] = (1 to kMax).flatMap(nucleiAt)
  }

  def scorer(mode: Mode): ProbPeeling.Scorer = mode match {
    case DP => (p, probs, theta) => PoissonBinomial.kappaFast(p, probs, theta)
    case AP => (p, probs, theta) => Approximations.kappaAuto(p, probs, theta)
  }

  /** Build the peeling-kernel input from a clique structure: items are
    * triangles with itemProb = Pr(Δ); groups are 4-cliques with the
    * Pr(E_i) incidences of Section 5.1.
    */
  def kernelInput(cs: CliqueStructure): ProbPeeling.Input = {
    val nC = cs.nCliques
    val groupItems = new Array[Array[Int]](nC)
    val groupPrE   = new Array[Array[Double]](nC)
    var c = 0
    while (c < nC) {
      groupItems(c) = java.util.Arrays.copyOfRange(cs.cliqueTris, 4 * c, 4 * c + 4)
      groupPrE(c)   = java.util.Arrays.copyOfRange(cs.cliquePrE, 4 * c, 4 * c + 4)
      c += 1
    }
    ProbPeeling.Input(cs.tris.prob, groupItems, groupPrE, cs.triCliques)
  }

  /** Run the decomposition. */
  def decompose(g: ProbGraph, theta: Double, mode: Mode = DP): Decomposition = {
    val cs  = FourCliques.build(g)
    val res = ProbPeeling.peel(kernelInput(cs), theta, scorer(mode))
    Decomposition(g, cs, theta, res.nu, res.initialKappa)
  }

  /** Same, reusing a prebuilt structure (lets DP and AP share enumeration). */
  def decompose(g: ProbGraph, cs: CliqueStructure, theta: Double, mode: Mode): Decomposition = {
    val res = ProbPeeling.peel(kernelInput(cs), theta, scorer(mode))
    Decomposition(g, cs, theta, res.nu, res.initialKappa)
  }

  /** Materialise the ℓ-(k,θ)-nuclei at level k: union-find over triangles
    * joined by "k-alive" 4-cliques (all four member triangles have ν ≥ k) —
    * this realises both the cliqueness precondition (nuclei are unions of
    * 4-cliques) and s-connectedness.
    */
  private def buildNuclei(d: Decomposition, k: Int): Seq[Nucleus] = {
    val cs = d.structure
    val nT = cs.nTriangles
    val parent = Array.tabulate(nT)(identity)
    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != r) { val nx = parent(c); parent(c) = r; c = nx }
      r
    }
    def union(a: Int, b: Int): Unit = { val ra = find(a); val rb = find(b); if (ra != rb) parent(ra) = rb }

    val kAlive = new Array[Boolean](cs.nCliques)
    var c = 0
    while (c < cs.nCliques) {
      var ok = true
      var i = 4 * c
      while (i < 4 * c + 4) { if (d.nu(cs.cliqueTris(i)) < k) ok = false; i += 1 }
      if (ok) {
        kAlive(c) = true
        union(cs.cliqueTris(4 * c), cs.cliqueTris(4 * c + 1))
        union(cs.cliqueTris(4 * c), cs.cliqueTris(4 * c + 2))
        union(cs.cliqueTris(4 * c), cs.cliqueTris(4 * c + 3))
      }
      c += 1
    }
    // group triangles by component, keeping only triangles covered by a
    // k-alive clique (cliqueness precondition)
    val covered = new Array[Boolean](nT)
    c = 0
    while (c < cs.nCliques) {
      if (kAlive(c)) {
        var i = 4 * c
        while (i < 4 * c + 4) { covered(cs.cliqueTris(i)) = true; i += 1 }
      }
      c += 1
    }
    val comps = mutable.LinkedHashMap.empty[Int, mutable.ArrayBuffer[Int]]
    var t = 0
    while (t < nT) {
      if (covered(t)) comps.getOrElseUpdate(find(t), mutable.ArrayBuffer.empty) += t
      t += 1
    }
    comps.values.toSeq.map { triIds =>
      val vs = mutable.SortedSet.empty[Int]
      val es = mutable.LinkedHashSet.empty[(Int, Int)]
      triIds.foreach { tid =>
        val (u, v, w) = (cs.tris.u(tid), cs.tris.v(tid), cs.tris.w(tid))
        vs += u; vs += v; vs += w
        es += ((u, v)); es += ((u, w)); es += ((v, w))
      }
      val edges = es.toArray.map { case (u, v) => (u, v, d.graph.prob(u, v)) }
      Nucleus(k, triIds.toArray, vs.toArray, edges)
    }
  }
}

package repro.core

import repro.graph.ProbGraph
import repro.prob.Sampler
import scala.collection.mutable
import scala.util.Random

/** g-NuDecomp (Section 6, Algorithm 2): approximate global nucleus
  * decomposition. Candidates are grown inside the union C_k of the
  * ℓ-(k,θ)-nuclei (every g-(k,θ)-nucleus is contained in one), closed so
  * every triangle has ≥ k 4-cliques in the candidate, then validated by
  * Monte-Carlo sampling of n possible worlds against the indicator
  * 1_g(G,Δ,k): the sampled world must itself be a deterministic k-nucleus
  * containing Δ.
  */
object GlobalNucleus {

  /** A probabilistic nucleus reported by the g/w algorithms, with original
    * vertex labels so it can be compared across graphs.
    */
  final case class ProbNucleus(
      k: Int,
      vertices: Array[Long],
      edges: Array[(Long, Long, Double)],
      /** estimated min-over-triangles tail probability (Eq. 17) */
      minTail: Double
  ) {
    def toGraph: ProbGraph = ProbGraph(edges.toIndexedSeq)
  }

  /** All g-(k,θ)-nuclei for k = 1..kMax of the local decomposition. */
  def decompose(local: LocalNucleus.Decomposition, nSamples: Int, seed: Long): Seq[ProbNucleus] =
    (1 to local.kMax).flatMap(k => decomposeAt(local, k, nSamples, seed + k))

  /** g-(k,θ)-nuclei at one level k. */
  def decomposeAt(local: LocalNucleus.Decomposition, k: Int,
                  nSamples: Int, seed: Long): Seq[ProbNucleus] = {
    val cs    = local.structure
    val theta = local.theta
    // k-alive cliques of C_k: all four member triangles have ν ≥ k
    val kAlive = new Array[Boolean](cs.nCliques)
    var c = 0
    while (c < cs.nCliques) {
      var ok = true
      var i = 4 * c
      while (i < 4 * c + 4) { if (local.nu(cs.cliqueTris(i)) < k) ok = false; i += 1 }
      kAlive(c) = ok
      c += 1
    }
    val aliveCliquesOf: Int => Array[Int] =
      t => local.structure.triCliques(t).filter(kAlive)

    val inCandidate = new Array[Boolean](cs.nTriangles)
    val out         = mutable.ArrayBuffer.empty[ProbNucleus]
    var t = 0
    while (t < cs.nTriangles) {
      if (!inCandidate(t) && local.nu(t) >= k && aliveCliquesOf(t).nonEmpty) {
        // closure: add all C_k cliques of any member triangle that has
        // fewer than k cliques inside the candidate (Algorithm 2, lines 6-8)
        val cliques   = mutable.LinkedHashSet.empty[Int]
        val triCount  = mutable.HashMap.empty[Int, Int].withDefaultValue(0)
        val work      = mutable.Queue.empty[Int]
        def addCliques(tri: Int): Unit = aliveCliquesOf(tri).foreach { cl =>
          if (cliques.add(cl)) {
            cs.members(cl).foreach { m =>
              val cnt = triCount(m) + 1
              triCount(m) = cnt
              if (cnt == 1) work += m // newly in H: may need its own closure
            }
          }
        }
        addCliques(t)
        var stable = false
        while (!stable) {
          stable = true
          val pending = triCount.keysIterator.filter(m => triCount(m) < k).toArray
          pending.foreach { m =>
            val before = cliques.size
            addCliques(m)
            if (cliques.size != before) stable = false
          }
        }
        val candTris = triCount.keysIterator.toArray
        candTris.foreach(inCandidate(_) = true)
        out ++= validate(local.graph, cs, candTris, cliques.toArray, k, theta, nSamples,
                         seed + t)
      }
      t += 1
    }
    out.toSeq
  }

  /** Monte-Carlo validation of one candidate (Algorithm 2, lines 9-16). */
  private def validate(g: ProbGraph, cs: repro.cliques.FourCliques.CliqueStructure,
                       candTris: Array[Int], candCliques: Array[Int], k: Int,
                       theta: Double, nSamples: Int, seed: Long): Option[ProbNucleus] = {
    // candidate subgraph: union of its 4-cliques' edges (labels preserved)
    val edgeSet = mutable.LinkedHashSet.empty[(Int, Int)]
    candTris.foreach { tid =>
      edgeSet += ((cs.tris.u(tid), cs.tris.v(tid)))
      edgeSet += ((cs.tris.u(tid), cs.tris.w(tid)))
      edgeSet += ((cs.tris.v(tid), cs.tris.w(tid)))
    }
    candCliques.foreach { cl =>
      val vs = cs.members(cl).flatMap(tid => Array(cs.tris.u(tid), cs.tris.v(tid), cs.tris.w(tid))).distinct.sorted
      var a = 0
      while (a < vs.length) {
        var b = a + 1
        while (b < vs.length) { edgeSet += ((vs(a), vs(b))); b += 1 }
        a += 1
      }
    }
    val labeledEdges = edgeSet.toArray.map { case (u, v) =>
      (g.labels(u), g.labels(v), g.prob(u, v))
    }
    val h   = ProbGraph(labeledEdges.toIndexedSeq)
    val rnd = new Random(seed)
    val hEdges = h.edges
    // per-triangle success counts, keyed by label triple
    val triLabels = candTris.map { tid =>
      (g.labels(cs.tris.u(tid)), g.labels(cs.tris.v(tid)), g.labels(cs.tris.w(tid)))
    }
    val counts = mutable.HashMap.empty[(Long, Long, Long), Int].withDefaultValue(0)
    var s = 0
    while (s < nSamples) {
      val world = Sampler.worldGraph(h, hEdges, Sampler.sampleMask(hEdges, rnd))
      if (DetNucleus.isKNucleus(world, k)) {
        triLabels.foreach { case key @ (a, b, c) =>
          if (containsTriangle(world, a, b, c)) counts(key) += 1
        }
      }
      s += 1
    }
    val minTail = triLabels.map(counts(_).toDouble / nSamples).min
    if (minTail >= theta)
      Some(ProbNucleus(k, h.labels.clone(), labeledEdges, minTail))
    else None
  }

  private[core] def containsTriangle(world: ProbGraph, a: Long, b: Long, c: Long): Boolean = {
    def idx(l: Long): Int = java.util.Arrays.binarySearch(world.labels, l)
    val (ia, ib, ic) = (idx(a), idx(b), idx(c))
    ia >= 0 && ib >= 0 && ic >= 0 &&
      world.hasEdge(ia, ib) && world.hasEdge(ia, ic) && world.hasEdge(ib, ic)
  }
}

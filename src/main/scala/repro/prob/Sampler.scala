package repro.prob

import repro.graph.ProbGraph
import scala.util.Random

/** Possible-world sampling (Section 6).
  *
  * A sampled world keeps each edge independently with its probability; per
  * the paper's space note we materialise a world as a bit per edge over the
  * canonical edge list, expanding to a deterministic [[ProbGraph]] (all
  * probabilities 1) only when a decomposition needs adjacency.
  */
object Sampler {

  /** Hoeffding sample size n ≥ ⌈ln(2/δ) / (2ε²)⌉ (Lemma 4). */
  def hoeffdingSamples(eps: Double, delta: Double): Int =
    math.ceil(math.log(2.0 / delta) / (2.0 * eps * eps)).toInt

  /** One world of `g` as a boolean mask over `g.edges` order. */
  def sampleMask(edges: Array[(Int, Int, Double)], rnd: Random): Array[Boolean] =
    edges.map { case (_, _, p) => rnd.nextDouble() < p }

  /** Expand a mask to a deterministic graph (p ≡ 1) on the present edges.
    * Vertex labels are preserved through `labels` of the source graph.
    */
  def worldGraph(g: ProbGraph, edges: Array[(Int, Int, Double)], mask: Array[Boolean]): ProbGraph = {
    val kept = Seq.newBuilder[(Long, Long, Double)]
    var i = 0
    while (i < edges.length) {
      if (mask(i)) {
        val (u, v, _) = edges(i)
        kept += ((g.labels(u), g.labels(v), 1.0))
      }
      i += 1
    }
    ProbGraph(kept.result())
  }

  /** Sample n worlds of g as deterministic graphs, deterministic in seed. */
  def sampleWorlds(g: ProbGraph, n: Int, seed: Long): IndexedSeq[ProbGraph] = {
    val rnd   = new Random(seed)
    val edges = g.edges
    (0 until n).map(_ => worldGraph(g, edges, sampleMask(edges, rnd)))
  }
}

package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.collection.mutable

/** A probabilistic graph G = (V, E, p): undirected simple graph with an
  * independent existence probability per edge (Section 2).
  *
  * Edges are canonicalised to u < v. Vertices are dense ids 0..n-1 after
  * [[ProbGraph.apply]]; the original labels are kept in `labels` so results
  * can be reported against the input ids.
  *
  * The in-memory form is the substrate for the peeling kernels; the
  * DataFrame form (`u: Long, v: Long, p: Double`) is the substrate for the
  * distributed enumeration dataflows.
  */
final class ProbGraph private (
    val n: Int,
    val labels: Array[Long],
    /** CSR offsets into `adj`/`adjProb`, length n+1. */
    val offsets: Array[Int],
    /** neighbour lists, sorted ascending per vertex. */
    val adj: Array[Int],
    /** probability of the edge to the corresponding neighbour. */
    val adjProb: Array[Double]
) extends Serializable {

  /** Number of undirected edges. */
  val m: Int = adj.length / 2

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  def maxDegree: Int = (0 until n).foldLeft(0)((b, v) => math.max(b, degree(v)))

  /** Neighbours of v (sorted). */
  def neighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(adj, offsets(v), offsets(v + 1))

  /** Probability of edge (u,v); NaN if absent. Binary search over the CSR row. */
  def prob(u: Int, v: Int): Double = {
    var lo = offsets(u); var hi = offsets(u + 1) - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      val w   = adj(mid)
      if (w == v) return adjProb(mid)
      else if (w < v) lo = mid + 1
      else hi = mid - 1
    }
    Double.NaN
  }

  def hasEdge(u: Int, v: Int): Boolean = !prob(u, v).isNaN

  /** Undirected edge list with canonical u < v. */
  def edges: Array[(Int, Int, Double)] = {
    val out = Array.newBuilder[(Int, Int, Double)]
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        val v = adj(i)
        if (u < v) out += ((u, v, adjProb(i)))
        i += 1
      }
      u += 1
    }
    out.result()
  }

  /** Average edge probability (Table 1 column p_avg). */
  def avgProb: Double = if (m == 0) 0.0 else {
    var s = 0.0; var i = 0
    while (i < adj.length) { s += adjProb(i); i += 1 }
    s / 2 / m
  }

  /** Induced subgraph on a vertex subset (keeps original labels). */
  def inducedSubgraph(keep: Set[Int]): ProbGraph = {
    val es = edges.collect { case (u, v, p) if keep(u) && keep(v) => (labels(u), labels(v), p) }
    ProbGraph(es.toIndexedSeq)
  }

  /** Subgraph restricted to a set of canonical (u<v) edge pairs. */
  def edgeSubgraph(keepEdges: Set[(Int, Int)]): ProbGraph = {
    val es = edges.collect { case (u, v, p) if keepEdges((u, v)) => (labels(u), labels(v), p) }
    ProbGraph(es.toIndexedSeq)
  }

  /** DataFrame bridge: columns u, v (original labels, u<v by label), p. */
  def toDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    edges.toIndexedSeq
      .map { case (u, v, p) =>
        val (lu, lv) = (labels(u), labels(v))
        if (lu < lv) (lu, lv, p) else (lv, lu, p)
      }
      .toDF("u", "v", "p")
  }
}

object ProbGraph {

  /** Build from an edge list (any orientation, duplicates collapsed keeping
    * the first probability). Vertex labels may be arbitrary longs.
    */
  def apply(edgeList: Seq[(Long, Long, Double)]): ProbGraph = {
    val canon = mutable.LinkedHashMap.empty[(Long, Long), Double]
    edgeList.foreach { case (a, b, p) =>
      require(p > 0.0 && p <= 1.0, s"edge probability must be in (0,1], got $p")
      if (a != b) {
        val key = if (a < b) (a, b) else (b, a)
        if (!canon.contains(key)) canon(key) = p
      }
    }
    val labels = canon.keysIterator.flatMap { case (a, b) => Iterator(a, b) }.toArray.distinct.sorted
    val index  = labels.zipWithIndex.toMap
    val n      = labels.length
    val deg    = new Array[Int](n)
    canon.keysIterator.foreach { case (a, b) => deg(index(a)) += 1; deg(index(b)) += 1 }
    val offsets = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val cursor  = offsets.clone()
    val adj     = new Array[Int](2 * canon.size)
    val adjProb = new Array[Double](2 * canon.size)
    canon.foreach { case ((a, b), p) =>
      val (ia, ib) = (index(a), index(b))
      adj(cursor(ia)) = ib; adjProb(cursor(ia)) = p; cursor(ia) += 1
      adj(cursor(ib)) = ia; adjProb(cursor(ib)) = p; cursor(ib) += 1
    }
    // sort each adjacency row (neighbour, prob) by neighbour id
    var v = 0
    while (v < n) {
      val from = offsets(v); val to = offsets(v + 1)
      val pairs = (from until to).map(j => (adj(j), adjProb(j))).sortBy(_._1)
      var j = from
      pairs.foreach { case (w, p) => adj(j) = w; adjProb(j) = p; j += 1 }
      v += 1
    }
    new ProbGraph(n, labels, offsets, adj, adjProb)
  }

  /** Build from a DataFrame with columns (u, v, p). Collects to the driver —
    * the peeling phase is a driver-side kernel by design (see DESIGN.md).
    */
  def fromDF(df: DataFrame): ProbGraph = {
    val rows = df.select("u", "v", "p").collect()
    apply(rows.toIndexedSeq.map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))))
  }
}

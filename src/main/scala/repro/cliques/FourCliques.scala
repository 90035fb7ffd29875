package repro.cliques

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.ProbGraph
import scala.collection.mutable

/** 4-clique enumeration and the triangle↔4-clique incidence structure.
  *
  * [[CliqueStructure]] is the in-memory substrate for all the peeling
  * algorithms: for every triangle Δ its member 4-cliques, and for every
  * (4-clique S, member triangle Δ) the probability Pr(E_i) of the three
  * edges joining S's apex (the vertex of S not in Δ) to Δ — exactly the
  * Bernoulli indicators of Section 5.1.
  *
  * The DataFrame path ([[dataframe]], [[incidence]]) is the distributed
  * dataflow: triangles joined three ways against edges to extend by an apex
  * d > c, then exploded to (triangle, Pr(E_i)) incidence rows.
  */
object FourCliques {

  /** Triangle/4-clique incidence for one graph.
    *
    * @param tris        canonical triangle list (u < v < w)
    * @param cliqueTris  flat array, 4 triangle ids per clique
    * @param cliquePrE   flat array, Pr(E_i) for the corresponding member
    * @param triCliques  per-triangle list of incident clique ids
    */
  final class CliqueStructure(
      val tris: Triangles.TriangleList,
      val cliqueTris: Array[Int],
      val cliquePrE: Array[Double],
      val triCliques: Array[Array[Int]]
  ) {
    def nTriangles: Int = tris.size
    def nCliques: Int   = cliqueTris.length / 4

    /** Member triangle ids of clique c. */
    def members(c: Int): Array[Int] =
      java.util.Arrays.copyOfRange(cliqueTris, 4 * c, 4 * c + 4)

    /** Pr(E_i) of triangle `tid` inside clique `c` (must be a member). */
    def prE(c: Int, tid: Int): Double = {
      var i = 4 * c
      while (i < 4 * c + 4) { if (cliqueTris(i) == tid) return cliquePrE(i); i += 1 }
      throw new NoSuchElementException(s"triangle $tid not in clique $c")
    }

    /** 4-clique support (number of 4-cliques containing each triangle). */
    def support(tid: Int): Int = triCliques(tid).length
  }

  /** Encode a sorted vertex triple as a long key (n < 2^21 in our data). */
  private def key(n: Long, u: Int, v: Int, w: Int): Long = (u * n + v) * n + w

  /** Build the incidence structure for g. */
  def build(g: ProbGraph): CliqueStructure = {
    val tris = Triangles.enumerate(g)
    val n    = g.n.toLong
    val id   = new mutable.LongMap[Int](tris.size * 2)
    var t = 0
    while (t < tris.size) { id(key(n, tris.u(t), tris.v(t), tris.w(t))) = t; t += 1 }

    val ct = Array.newBuilder[Int]
    val ce = Array.newBuilder[Double]
    val triDeg = new Array[Int](tris.size)
    var nCliques = 0
    t = 0
    while (t < tris.size) {
      val (u, v, w) = (tris.u(t), tris.v(t), tris.w(t))
      // 3-way sorted intersection of adj(u), adj(v), adj(w) for x > w:
      // each 4-clique {u,v,w,x} with u<v<w<x is found exactly once, from
      // its lexicographically-least triangle.
      var a = g.offsets(u); var b = g.offsets(v); var c = g.offsets(w)
      val aE = g.offsets(u + 1); val bE = g.offsets(v + 1); val cE = g.offsets(w + 1)
      while (a < aE && b < bE && c < cE) {
        val x = g.adj(a); val y = g.adj(b); val z = g.adj(c)
        if (x == y && y == z) {
          if (x > w) {
            val pux = g.adjProb(a); val pvx = g.adjProb(b); val pwx = g.adjProb(c)
            val puv = g.prob(u, v); val puw = g.prob(u, w); val pvw = g.prob(v, w)
            val t_uvw = t
            val t_uvx = id(key(n, u, v, x))
            val t_uwx = id(key(n, u, w, x))
            val t_vwx = id(key(n, v, w, x))
            // Pr(E_i) of each member = product of the 3 edges to its apex
            ct += t_uvw; ce += pux * pvx * pwx // apex x
            ct += t_uvx; ce += puw * pvw * pwx // apex w
            ct += t_uwx; ce += puv * pvw * pvx // apex v
            ct += t_vwx; ce += puv * puw * pux // apex u
            triDeg(t_uvw) += 1; triDeg(t_uvx) += 1
            triDeg(t_uwx) += 1; triDeg(t_vwx) += 1
            nCliques += 1
          }
          a += 1; b += 1; c += 1
        } else {
          val m = math.max(x, math.max(y, z))
          if (x < m) a += 1
          if (y < m) b += 1
          if (z < m) c += 1
        }
      }
      t += 1
    }
    val cliqueTris = ct.result()
    val cliquePrE  = ce.result()
    val triCliques = new Array[Array[Int]](tris.size)
    var i = 0
    while (i < tris.size) { triCliques(i) = new Array[Int](triDeg(i)); triDeg(i) = 0; i += 1 }
    i = 0
    while (i < cliqueTris.length) {
      val tid = cliqueTris(i)
      triCliques(tid)(triDeg(tid)) = i / 4
      triDeg(tid) += 1
      i += 1
    }
    new CliqueStructure(tris, cliqueTris, cliquePrE, triCliques)
  }

  /** Distributed 4-clique listing: extend canonical triangles by an apex
    * d > c adjacent to all three. Returns
    * (a,b,c,d, pab,pac,pbc,pad,pbd,pcd) with a < b < c < d by label.
    */
  def dataframe(edges: DataFrame): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    val tri = Triangles.dataframe(edges)
    val canon = edges.select(
      least($"u", $"v") as "s", greatest($"u", $"v") as "t", $"p")
    val ead = canon.select($"s" as "a", $"t" as "d", $"p" as "pad")
    val ebd = canon.select($"s" as "b", $"t" as "d", $"p" as "pbd")
    val ecd = canon.select($"s" as "c", $"t" as "d", $"p" as "pcd")
    tri
      .join(ecd, "c")              // d > c automatically since edges are s < t
      .join(ebd, Seq("b", "d"))
      .join(ead, Seq("a", "d"))
      .select($"a", $"b", $"c", $"d", $"pab", $"pac", $"pbc", $"pad", $"pbd", $"pcd")
  }

  /** Distributed incidence dataflow: one row per (4-clique, member triangle)
    * with the member's Pr(E_i) — the input to the distributed initial-κ
    * scoring of `NucleusScores`.
    * Columns: x, y, z (the member triangle, x < y < z), prE.
    */
  def incidence(edges: DataFrame): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    val cl = dataframe(edges)
    val rows = cl.select(explode(array(
      struct($"a" as "x", $"b" as "y", $"c" as "z", ($"pad" * $"pbd" * $"pcd") as "prE"),
      struct($"a" as "x", $"b" as "y", $"d" as "z", ($"pac" * $"pbc" * $"pcd") as "prE"),
      struct($"a" as "x", $"c" as "y", $"d" as "z", ($"pab" * $"pbc" * $"pbd") as "prE"),
      struct($"b" as "x", $"c" as "y", $"d" as "z", ($"pab" * $"pac" * $"pad") as "prE")
    )) as "r")
    rows.select($"r.x" as "x", $"r.y" as "y", $"r.z" as "z", $"r.prE" as "prE")
  }
}

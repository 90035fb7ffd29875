package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.cliques.Triangles
import repro.graph.ProbGraph

/** Cohesiveness metrics of Section 7.4: probabilistic density (Eq. 19) and
  * probabilistic clustering coefficient (Eq. 20). In-memory versions for the
  * decomposition outputs plus DataFrame versions that are DuckDB-checkable.
  */
object Metrics {

  /** PD(G) = Σ_e p(e) / (|V|·(|V|−1)/2). */
  def pd(g: ProbGraph): Double = {
    if (g.n < 2) return 0.0
    val sum = g.edges.map(_._3).sum
    sum / (g.n.toDouble * (g.n - 1) / 2.0)
  }

  /** PCC(G) = 3·Σ_Δ p(u,v)p(v,w)p(u,w) / Σ_{(u,v),(u,w),v≠w} p(u,v)p(u,w).
    * The denominator sums over unordered wedge pairs at each centre vertex:
    * Σ_u (S_u² − Q_u)/2 with S_u = Σ_v p(u,v), Q_u = Σ_v p(u,v)².
    */
  def pcc(g: ProbGraph): Double = {
    val tris    = Triangles.enumerate(g)
    var num     = 0.0
    var t       = 0
    while (t < tris.size) { num += tris.prob(t); t += 1 }
    var den = 0.0
    var u   = 0
    while (u < g.n) {
      var s = 0.0; var q = 0.0
      var i = g.offsets(u)
      while (i < g.offsets(u + 1)) { val p = g.adjProb(i); s += p; q += p * p; i += 1 }
      den += (s * s - q) / 2.0
      u += 1
    }
    if (den == 0.0) 0.0 else 3.0 * num / den
  }

  /** DataFrame PD over an edge DataFrame (u, v, p); |V| from the edges. */
  def pdDF(edges: DataFrame): Double = {
    val spark = edges.sparkSession
    import spark.implicits._
    val nv = edges.select($"u" as "x").union(edges.select($"v" as "x")).distinct.count()
    if (nv < 2) return 0.0
    val s = edges.agg(sum($"p")).head.getDouble(0)
    s / (nv.toDouble * (nv - 1) / 2.0)
  }

  /** DataFrame PCC via the triangle dataflow and a per-vertex wedge sum. */
  def pccDF(edges: DataFrame): Double = {
    val spark = edges.sparkSession
    import spark.implicits._
    val tri = Triangles.dataframe(edges)
    val num = tri.agg(coalesce(sum($"pab" * $"pac" * $"pbc"), lit(0.0))).head.getDouble(0)
    val perEnd = edges.select($"u" as "x", $"p").union(edges.select($"v" as "x", $"p"))
    val den = perEnd.groupBy("x")
      .agg(((pow(sum($"p"), 2) - sum($"p" * $"p")) / 2.0) as "wedges")
      .agg(coalesce(sum($"wedges"), lit(0.0))).head.getDouble(0)
    if (den == 0.0) 0.0 else 3.0 * num / den
  }
}

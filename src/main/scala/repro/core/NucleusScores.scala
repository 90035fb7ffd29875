package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.cliques.{FourCliques, Triangles}
import repro.prob.{Approximations, PoissonBinomial}

/** Distributed initial κ scoring (Algorithm 1, line 3, as a dataflow).
  *
  * The per-triangle score κ(Δ) = argmax_k { Pr(Δ)·Pr[ζ ≥ k] ≥ θ } depends
  * only on Δ's own Pr(E_i) multiset, so it is embarrassingly parallel:
  * the (triangle, Pr(E_i)) incidence dataflow is grouped per triangle and a
  * scoring UDF (exact DP or the hybrid AP selector) evaluates κ. The
  * sequential peeling phase then starts from these scores (see DESIGN.md's
  * layering note).
  */
object NucleusScores {

  /** Per-triangle initial κ over an edge DataFrame (u, v, p).
    * Output columns: x, y, z (triangle, x < y < z), support (c_Δ),
    * triProb (Pr(Δ)), kappa.
    */
  def initialKappa(edges: DataFrame, theta: Double, mode: LocalNucleus.Mode): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    val scoreUdf = mode match {
      case LocalNucleus.DP =>
        udf((p: Double, prEs: Seq[Double]) => PoissonBinomial.kappaFast(p, prEs.toArray, theta))
      case LocalNucleus.AP =>
        udf((p: Double, prEs: Seq[Double]) => Approximations.kappaAuto(p, prEs.toArray, theta))
    }
    val tri = Triangles.dataframe(edges)
      .select($"a" as "x", $"b" as "y", $"c" as "z", ($"pab" * $"pac" * $"pbc") as "triProb")
    val inc = FourCliques.incidence(edges)
      .groupBy("x", "y", "z")
      .agg(collect_list($"prE") as "prEs", count(lit(1)) as "support")
    tri.join(inc, Seq("x", "y", "z"), "left")
      .select(
        $"x", $"y", $"z",
        coalesce($"support", lit(0L)) as "support",
        $"triProb",
        scoreUdf($"triProb", coalesce($"prEs", array())) as "kappa")
  }
}

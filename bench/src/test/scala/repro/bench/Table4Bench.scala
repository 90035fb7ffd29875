package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 4 — cohesiveness of ℓ-(k,θ)-nucleus vs (k,γ)-truss vs (k,η)-core
  * at their maximum scores (dblp / pokec / biomine, θ ∈ {0.1, 0.3}).
  * Paper shape: PD_N > PD_T > PD_C and PCC_N > PCC_T > PCC_C (nucleus ~30%
  * denser than truss, ~200% denser than core on dblp); score scales order
  * k_Nmax ≤ k_Tmax ≤ k_Cmax; nucleus components are the smallest.
  */
class Table4Bench extends AnyFunSuite {

  test("Table 4: nucleus vs truss vs core cohesiveness") {
    val rows = Tables.table4()
    println("== Table 4: nucleus (N) / truss (T) / core (C) at max k ==")
    println(Tables.formatTable4(rows))

    rows.foreach { r =>
      val tag = s"${r.dataset} θ=${r.theta}"
      // nucleus never loses to truss or core (ties occur when one dense
      // complex dominates — the paper's biomine rows show the same
      // nucleus ≈ truss behaviour)
      assert(r.nucleus.pd >= r.core.pd - 1e-9, s"$tag: PD nucleus < core")
      assert(r.nucleus.pcc >= r.core.pcc - 1e-9, s"$tag: PCC nucleus < core")
      assert(r.nucleus.pd >= r.truss.pd - 0.05, s"$tag: PD nucleus well below truss")
      assert(r.truss.pd >= r.core.pd - 0.05, s"$tag: PD truss well below core")
      // score scales: each nucleus level is stricter than truss, truss than core
      assert(r.nucleus.kMax <= r.truss.kMax, s"$tag: k_Nmax > k_Tmax")
      assert(r.truss.kMax <= r.core.kMax, s"$tag: k_Tmax > k_Cmax")
      // nucleus components are the tightest subgraphs
      assert(r.nucleus.nV <= r.core.nV, s"$tag: nucleus bigger than core")
    }
    // across the whole table, nucleus is strictly denser on average
    def avg(f: Tables.T4Side => Double, pick: Tables.T4Row => Tables.T4Side) =
      rows.map(r => f(pick(r))).sum / rows.size
    assert(avg(_.pd, _.nucleus) > avg(_.pd, _.core), "avg PD: nucleus must beat core")
    assert(avg(_.pcc, _.nucleus) > avg(_.pcc, _.core), "avg PCC: nucleus must beat core")
    assert(avg(_.pd, _.nucleus) > avg(_.pd, _.truss) - 1e-9, "avg PD: nucleus must match/beat truss")
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 2 — accuracy of AP vs exact DP on final nucleus scores
  * (θ ∈ {0.2, 0.4}, all six paper datasets). Paper shape: average error
  * ≲ 0.05, percentage of triangles with error ≲ 5%, both shrinking as θ
  * grows; AP at least as fast as DP.
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: AP error vs DP across datasets") {
    val rows = Tables.table2()
    println("== Table 2: AP accuracy vs DP (paper Table 2) ==")
    println(Tables.formatTable2(rows))

    rows.foreach { r =>
      assert(r.avgError <= 0.15, s"${r.dataset} θ=${r.theta}: avg error ${r.avgError}")
      assert(r.pctWithError <= 12.0, s"${r.dataset} θ=${r.theta}: ${r.pctWithError}% wrong")
    }
    // per dataset, error does not grow with θ (paper: shrinks)
    rows.groupBy(_.dataset).foreach { case (d, rs) =>
      val sorted = rs.sortBy(_.theta)
      assert(sorted.head.avgError >= sorted.last.avgError - 0.02,
        s"$d: error should not grow with θ")
    }
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 3 — robustness of AP to the edge-probability distribution
  * (pokec topology with Normal / Pareto / Uniform probabilities,
  * θ ∈ {0.1, 0.2, 0.3}). Paper shape: errors stay small under every
  * distribution; Pareto's small probabilities collapse the score range.
  */
class Table3Bench extends AnyFunSuite {

  test("Table 3: AP error across probability distributions") {
    val rows = Tables.table3()
    println("== Table 3: pokec with Normal / Pareto / Uniform probabilities ==")
    println(Tables.formatTable2(rows))

    rows.foreach { r =>
      assert(r.avgError <= 0.15, s"${r.dataset} θ=${r.theta}: avg error ${r.avgError}")
      assert(r.pctWithError <= 12.0, s"${r.dataset} θ=${r.theta}")
    }
    // all three distributions ran on the same topology (same triangle count
    // universe before θ filtering is graph-level, so just non-empty)
    assert(rows.map(_.dataset).distinct.size == 3)
  }
}

package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen

/** Smoke + shape tests of the experiment harness at tiny scale: the same
  * code paths the bench suites run at full stand-in scale.
  */
class TablesSpec extends AnyFunSuite {

  test("table1 rows carry positive statistics and paper-like ordering") {
    val rows = Tables.table1(Seq("krogan", "dblp"), scale = 0.05)
    assert(rows.size == 2)
    rows.foreach { r =>
      assert(r.stats.nVertices > 0 && r.stats.nEdges > 0)
      assert(r.stats.pAvg > 0 && r.stats.pAvg <= 1)
    }
    assert(Tables.formatTable1(rows).linesIterator.size == 3)
  }

  test("accuracyRow: AP error metrics are bounded and consistent") {
    val g   = GraphGen.dataset("krogan", 0.2)
    val row = Tables.accuracyRow("krogan", g, theta = 0.2)
    assert(row.avgError >= 0 && row.pctWithError >= 0 && row.pctWithError <= 100)
    assert(row.nTriangles > 0)
    assert(row.dpSec > 0 && row.apSec > 0)
  }

  test("table4Row: nucleus beats truss and core on PD and PCC (planted data)") {
    val g   = GraphGen.dataset("dblp", 0.1)
    val row = Tables.table4Row("dblp", g, theta = 0.1)
    assert(row.nucleus.pd >= row.core.pd, "nucleus PD should beat core PD")
    assert(row.nucleus.pcc >= row.core.pcc, "nucleus PCC should beat core PCC")
    assert(row.nucleus.kMax <= row.truss.kMax && row.truss.kMax <= row.core.kMax,
      "score scales must order k_N ≤ k_T ≤ k_C")
  }

  test("tableEnwiki at tiny scale: AP completes and DP reports a time or N.P.") {
    val rows = Tables.tableEnwiki(thetas = Seq(0.3, 0.5), scale = 0.02, dpBudgetSec = 60)
    assert(rows.size == 2)
    rows.foreach { r => assert(r.apSec > 0) }
    // runtime decreases (or stays flat) as θ grows — fewer surviving triangles
    assert(Tables.formatTableEnwiki(rows).contains("theta"))
  }

  test("table5 at tiny scale produces stable g/w statistics") {
    val rows = Tables.table5(sampleSizes = Seq(60, 120), theta = 0.1, scale = 0.25)
    assert(rows.size == 2)
    assert(Tables.formatTable5(rows).linesIterator.size == 4) // header + 2 + SD
  }

  test("scorerWithBudget aborts long computations") {
    val slow: repro.core.ProbPeeling.Scorer = (p, probs, th) => { Thread.sleep(0, 100); 0 }
    val budgeted = Tables.scorerWithBudget(slow, budgetSec = 0.000001)
    intercept[Tables.NotPossible] {
      var i = 0
      while (i < 100000) { budgeted(1.0, Array(0.5), 0.5); i += 1 }
    }
  }
}

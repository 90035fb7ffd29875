package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** §7.2 inline table — enwiki-2013 stand-in scalability: DP vs AP runtime
  * for θ ∈ {0.1 .. 0.5}. Paper shape: AP ≤ DP at every θ with the gap
  * largest at θ = 0.1 (where the paper's DP could not complete at all);
  * both runtimes fall as θ grows because fewer triangles survive.
  */
class TableEnwikiBench extends AnyFunSuite {

  test("enwiki scaling: DP vs AP across θ") {
    val rows = Tables.tableEnwiki()
    println("== §7.2 inline table: enwiki stand-in, DP vs AP runtimes ==")
    println(Tables.formatTableEnwiki(rows))

    // AP always completes (the paper's headline: DP cannot at θ = 0.1)
    rows.foreach(r => assert(r.apSec > 0))
    // at the scalability-critical smallest θ, AP beats (or DP timed out)
    val smallest = rows.minBy(_.theta)
    smallest.dpSec.foreach(dp => assert(smallest.apSec <= dp * 1.1 + 0.5,
      s"θ=${smallest.theta}: AP ${smallest.apSec}s vs DP ${dp}s"))
    // runtime decreases with θ (monotone up to noise) for AP — sub-second
    // cells are dominated by JIT/GC noise, hence the additive slack
    val ap = rows.sortBy(_.theta).map(_.apSec)
    ap.sliding(2).foreach {
      case Seq(a, b) => assert(b <= a * 1.3 + 0.5, s"AP runtime should shrink with θ: $ap")
      case _         =>
    }
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 5 — effect of ε and δ (through the Monte-Carlo sample size
  * n ∈ {150, 300, 500, 1000, 2000}) on the average PD / PCC / edge count /
  * vertex count of global and weakly-global nuclei (krogan, θ = 0.1).
  * Paper shape: all metrics essentially flat across n — SD within ~1–2% of
  * the mean (the paper reports ≤ 1%) — validating ε = δ = 0.1.
  */
class Table5Bench extends AnyFunSuite {

  test("Table 5: g/w nuclei metrics are stable across sample sizes") {
    val rows = Tables.table5()
    println("== Table 5: sample-size stability of g/w nuclei (krogan, θ=0.1) ==")
    println(Tables.formatTable5(rows))

    def relSd(xs: Seq[Double]): Double = {
      val m = xs.sum / xs.size
      if (m == 0) 0.0 else math.sqrt(xs.map(x => (x - m) * (x - m)).sum / xs.size) / m
    }
    assert(rows.nonEmpty)
    // at least one of g/w produced nuclei at every sample size
    assert(rows.forall(r => r.pdG > 0 || r.pdW > 0))
    val stable = Seq(rows.map(_.pdW), rows.map(_.pccW))
    stable.filter(_.forall(_ > 0)).foreach { xs =>
      assert(relSd(xs) <= 0.05, s"metric unstable across n: $xs")
    }
    val stableG = Seq(rows.map(_.pdG), rows.map(_.pccG))
    stableG.filter(_.forall(_ > 0)).foreach { xs =>
      assert(relSd(xs) <= 0.05, s"g-metric unstable across n: $xs")
    }
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 1 — dataset statistics of every stand-in (paper Table 1).
  * Prints the paper-style rows; asserts the size ordering the paper's
  * datasets have (krogan smallest, enwiki largest by triangles).
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: dataset statistics") {
    val rows = Tables.table1()
    println("== Table 1: Dataset Statistics (stand-ins; see EXPERIMENTS.md) ==")
    println(Tables.formatTable1(rows))

    val byName = rows.map(r => r.dataset -> r.stats).toMap
    assert(byName("krogan").nTriangles < byName("dblp").nTriangles)
    assert(byName("dblp").nTriangles < byName("pokec").nTriangles)
    assert(byName("pokec").nTriangles < byName("ljournal").nTriangles)
    assert(byName("ljournal").nTriangles < byName("enwiki").nTriangles)
    // probability regimes mirror the paper: krogan high, flickr low
    assert(byName("krogan").pAvg > 0.55)
    assert(byName("flickr").pAvg < 0.25)
    assert(byName("biomine").pAvg < 0.4)
    rows.foreach(r => assert(r.stats.dMax > 0 && r.stats.nEdges > r.stats.nVertices / 2))
  }
}

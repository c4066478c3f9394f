package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Table V — dataset characteristics of the four synthetic stand-ins. */
class TableV_Datasets extends AnyFunSuite {
  test("Table V: dataset characteristics") {
    val t = Experiments.tableV()
    BenchOut.emit("tableV", t)
    assert(t.rows.size == 4)
    // Sequence counts mirror the paper's real datasets exactly.
    val bySet = t.rows.map(r => r(0) -> r(1).toInt).toMap
    assert(bySet("RE") == 1460 && bySet("SC") == 1249 &&
      bySet("INF") == 608 && bySet("HFM") == 730)
    // Multi-symbol alphabet: events ≈ 3 per series.
    for (r <- t.rows) assert(r(3).toInt >= 2 * r(2).toInt)
  }
}

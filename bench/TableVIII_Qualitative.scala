package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Table VIII — qualitative: the top recovered seasonal patterns, which
  * must include the planted Contains chains (the analog of the paper's
  * P1–P11 domain patterns).
  */
class TableVIII_Qualitative extends AnyFunSuite {
  test("Table VIII: recovered seasonal patterns incl. planted ground truth") {
    val t = Experiments.tableVIII()
    BenchOut.emit("tableVIII", t)
    assert(t.rows.nonEmpty)
    val rendered = t.rows.map(_(1)).mkString("\n")
    // The planted chain S000 >= S001 must surface on both datasets.
    assert(rendered.contains("S000:2 >= S001:2"), rendered)
    // Season counts are at least minSeason = 8.
    for (r <- t.rows) assert(r(2).toInt >= 8)
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Tables XIX / XX — ε (tolerance buffer) sensitivity: pattern counts per
  * ε and the loss relative to ε = 0. Paper shape: losses are small single-
  * digit percentages that grow with ε.
  */
class TableXIX_XX_Epsilon extends AnyFunSuite {
  test("Tables XIX/XX: ε sensitivity on all four datasets") {
    val t = Experiments.epsilonSensitivity()
    BenchOut.emit("tableXIX_XX", t)
    val byDs = t.rows.groupBy(_(0))
    assert(byDs.keySet == Set("RE", "SC", "INF", "HFM"))
    for ((ds, rows) <- byDs) {
      val ordered = rows.sortBy(_(1).toInt)
      assert(ordered.head(3).toDouble == 0.0, s"$ds ε=0 loss must be 0")
      for (r <- ordered) {
        val loss = r(3).toDouble
        assert(loss > -50.0 && loss < 100.0, s"$ds ε=${r(1)} loss $loss out of band")
      }
    }
  }
}

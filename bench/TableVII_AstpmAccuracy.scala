package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Table VII — A-STPM accuracy vs (minSeason × minDensity) on the RE and
  * INF analogs. Paper shape: accuracy is high (≥ 81%) at the loosest
  * configuration and rises toward 100% as minSeason / minDensity grow.
  */
class TableVII_AstpmAccuracy extends AnyFunSuite {
  test("Table VII: A-STPM accuracy on RE and INF") {
    val t = Experiments.tableVII()
    BenchOut.emit("tableVII", t)
    val grid = t.rows.map(r => r.head.toInt -> r.tail.map(_.toDouble))
    for ((_, cells) <- grid; c <- cells) assert(c >= 0.0 && c <= 100.0)
    // Shape: the strictest row dominates (or ties) the loosest row.
    val loose = grid.head._2
    val strict = grid.last._2
    assert(strict.zip(loose).count { case (s, l) => s >= l } >= loose.size / 2,
      s"accuracy did not improve with minSeason: loose=$loose strict=$strict")
    // Headline: accuracy at the loosest config is already substantial.
    assert(loose.max >= 60.0, s"loose-config accuracy too low: $loose")
  }
}

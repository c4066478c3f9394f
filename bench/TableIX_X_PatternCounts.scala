package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Tables IX / X (and appendix XIII / XIV) — number of seasonal patterns
  * per (maxPeriod × minSeason–minDensity) cell. Paper shape: counts drop
  * as minSeason or minDensity rise, and grow with maxPeriod.
  */
class TableIX_X_PatternCounts extends AnyFunSuite {
  for (name <- Seq("RE", "INF", "SC", "HFM")) {
    test(s"Tables IX/X: #seasonal patterns on $name") {
      val t = Experiments.patternCounts(name)
      BenchOut.emit(s"tableIX_X_$name", t)
      val grid = t.rows.map(r => r.head.toDouble -> r.tail.map(_.toInt))
      // maxPeriod monotonicity: each column is non-decreasing top-to-bottom.
      val cols = grid.head._2.indices
      val growsWithMaxPeriod = cols.count { c =>
        grid.map(_._2(c)).sliding(2).forall { case Seq(a, b) => b >= a; case _ => true }
      }
      assert(growsWithMaxPeriod >= cols.size / 2,
        s"counts did not mostly grow with maxPeriod on $name")
      // minSeason monotonicity within a row: 8-d >= 16-d for each density.
      for ((_, cells) <- grid; d <- 0 until 3)
        assert(cells(d) >= cells(6 + d),
          s"minSeason=8 count < minSeason=16 count on $name")
    }
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Tables XI + XII (appendix XV/XVI/XVIII) — A-STPM pruning percentages
  * and accuracy on the scaled synthetic datasets, sharing one mining pass
  * per (size × config) cell.
  */
class TableXI_XII_Scaled extends AnyFunSuite {
  for (base <- Seq("RE", "INF")) {
    test(s"Tables XI/XII: A-STPM pruning and accuracy on scaled $base") {
      val cells = Experiments.scaledAstpm(base)
      val t11 = Experiments.tableXI(base, cells)
      val t12 = Experiments.tableXII(base, cells)
      BenchOut.emit(s"tableXI_$base", t11)
      BenchOut.emit(s"tableXII_$base", t12)
      // Pruning is substantial: the noise half of each block is prunable.
      for (c <- cells) {
        assert(c.prunedSeriesPct > 10.0, s"$c prunes too little")
        assert(c.prunedSeriesPct < 95.0, s"$c prunes everything")
        assert(c.prunedEventsPct > 0.0)
        assert(c.accuracyPct >= 0.0 && c.accuracyPct <= 100.0)
      }
      // Accuracy at the strictest config is at least that of the loosest
      // for most sizes (paper's Table XII shape).
      val bySize = cells.groupBy(_.size)
      val improving = bySize.values.count { cs =>
        cs.last.accuracyPct >= cs.head.accuracyPct
      }
      assert(improving >= bySize.size / 2, "accuracy did not mostly improve with thresholds")
    }
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Figs. 15–16 as a table — the E-STPM pruning ablation: NoPrune /
  * Apriori-only / Trans-only / All. Paper shape: All is fastest, both
  * single prunings beat NoPrune, with identical outputs.
  */
class FigPruningAblation extends AnyFunSuite {
  test("Figs. 15-16: pruning ablation") {
    val t = Experiments.pruningAblation()
    BenchOut.emit("figPruningAblation", t)
    // Columns: minSeason, NoPrune ms, NoPrune checks, Apriori ms, Apriori
    // checks, Trans ms, Trans checks, All ms, All checks.
    for (r <- t.rows) {
      val noPruneChecks = r(2).toLong
      val aprioriChecks = r(4).toLong
      val transChecks = r(6).toLong
      val allChecks = r(8).toLong
      // Relation-check counts are deterministic — firm assertions.
      assert(allChecks <= aprioriChecks, r.toString)
      assert(allChecks <= transChecks, r.toString)
      assert(aprioriChecks <= noPruneChecks, r.toString)
      assert(transChecks <= noPruneChecks, r.toString)
      // Wall-clock: All must beat NoPrune (generous jitter slack).
      assert(r(7).toLong <= r(1).toLong * 2, s"All not faster than NoPrune: $r")
    }
  }
}

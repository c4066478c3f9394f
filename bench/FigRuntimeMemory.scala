package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Figs. 7–10 as a table — the paper's headline quantitative claim:
  * A-STPM is the fastest and lightest, E-STPM beats the APS-growth
  * baseline in both runtime and memory.
  */
class FigRuntimeMemory extends AnyFunSuite {
  test("Figs. 7-10: runtime & memory, A-STPM vs E-STPM vs APS-growth") {
    val t = Experiments.runtimeMemory()
    BenchOut.emit("figRuntimeMemory", t)
    for (r <- t.rows) {
      val aMs = r(2).toLong; val eMs = r(4).toLong; val bMs = r(5).toLong
      val aEntries = r(6).toLong; val eEntries = r(7).toLong
      // Ordering claims (with generous slack for wall-clock jitter):
      assert(aMs <= eMs, s"A-STPM ($aMs ms) not faster than E-STPM ($eMs ms): $r")
      assert(eMs <= bMs, s"E-STPM ($eMs ms) not faster than the baseline ($bMs ms): $r")
      assert(bMs > aMs, s"baseline ($bMs ms) not slower than A-STPM ($aMs ms): $r")
      assert(aEntries <= eEntries, s"A-STPM entries exceed E-STPM's: $r")
      // Result-set sanity: E-STPM and the baseline agree exactly.
      assert(r(13) == r(14), s"E-STPM and APS-growth pattern counts differ: $r")
    }
  }
}

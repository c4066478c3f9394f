package repro.jobs

import repro.exp.Experiments

/** Figs. 7–10 as a table — runtime & memory comparison of A-STPM,
  * E-STPM and the APS-growth baseline.
  */
object FigRuntimeMemoryJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("figRuntimeMemory") { _ =>
      JobSupport.emit(Experiments.runtimeMemory())
    }
}

package repro.jobs

import repro.exp.Experiments

/** Figs. 15–16 as a table — the E-STPM pruning ablation. */
object FigPruningAblationJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("figPruningAblation") { _ =>
      JobSupport.emit(Experiments.pruningAblation())
    }
}

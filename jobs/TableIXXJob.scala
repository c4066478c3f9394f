package repro.jobs

import repro.exp.Experiments

/** Tables IX/X (+ appendix XIII/XIV) — pattern-count sweeps. Optional
  * args: dataset names (default all four).
  */
object TableIXXJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableIX_X") { _ =>
      val names = if (args.nonEmpty) args.toSeq else Seq("RE", "INF", "SC", "HFM")
      names.foreach(n => JobSupport.emit(Experiments.patternCounts(n)))
    }
}

package repro.jobs

import repro.exp.Experiments

/** Tables XI + XII (+ appendix XV/XVI/XVIII) — A-STPM pruning and
  * accuracy on scaled synthetic data. Optional args: base datasets.
  */
object TableXIXIIJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableXI_XII") { _ =>
      val bases = if (args.nonEmpty) args.toSeq else Seq("RE", "INF")
      for (b <- bases) {
        val cells = Experiments.scaledAstpm(b)
        JobSupport.emit(Experiments.tableXI(b, cells))
        JobSupport.emit(Experiments.tableXII(b, cells))
      }
    }
}

package repro.jobs

import repro.exp.Experiments

/** Tables XIX/XX — tolerance buffer ε sensitivity. */
object TableXIXXXJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableXIX_XX") { _ =>
      JobSupport.emit(Experiments.epsilonSensitivity())
    }
}

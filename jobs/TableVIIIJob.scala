package repro.jobs

import repro.exp.Experiments

/** Table VIII — qualitative seasonal patterns (maxK = 3). */
object TableVIIIJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableVIII") { _ => JobSupport.emit(Experiments.tableVIII()) }
}

package repro.jobs

import repro.exp.Experiments

/** Table VII — A-STPM accuracy grid on the RE / INF analogs. */
object TableVIIJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableVII") { _ => JobSupport.emit(Experiments.tableVII()) }
}

package repro.jobs

import repro.exp.Experiments

/** Table V — dataset characteristics. `spark-submit --class repro.jobs.TableVJob`. */
object TableVJob {
  def main(args: Array[String]): Unit =
    JobSupport.withSpark("tableV") { _ => JobSupport.emit(Experiments.tableV()) }
}

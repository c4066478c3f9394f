package repro.jobs

import repro.core._
import repro.data.SeasonalGen
import repro.exp.{Experiments, TableResult}

/** End-to-end Spark pipeline demo: generate a preset as a raw DataFrame,
  * run Phase 1 (symbolize → sequence mapping → instances) through
  * Catalyst, mine with the distributed level-2 fan-out, and print the
  * frequent seasonal patterns. Args: [dataset] [minSeason].
  */
object SparkPipelineJob {
  def main(args: Array[String]): Unit = {
    val name = args.headOption.getOrElse("INF")
    val minSeason = args.lift(1).map(_.toInt).getOrElse(8)
    JobSupport.withSpark(s"stpm-$name") { spark =>
      val spec = SeasonalGen.preset(name)
      val raw = SparkSTPM.rawDF(spark, SeasonalGen.rawSeries(spec))
      val cuts = (0 until spec.nSeries)
        .map(i => SeasonalGen.seriesName(i) -> SeasonalGen.Cuts).toMap
      val sym = SparkSTPM.symbolize(raw, cuts)
      val inst = SparkSTPM.toInstances(sym, spec.m)
      val db = SparkSTPM.collectSeqDB(inst, spec.m)
      val cfg = STPMConfig(
        Experiments.cfgOf(db.size, name, 0.4, 0.75, minSeason), maxK = 3)
      val res = SparkSTPM.mine(spark, db, cfg)
      val rows = res.frequent.sortBy(p => (-p.k, -p.support.size)).take(30).toVector
        .map(p => Vector(p.key.render, p.k.toString, p.support.size.toString,
          p.seasonCount(cfg.season).toString))
      JobSupport.emit(TableResult(
        s"Distributed STPM on $name (minSeason=$minSeason): " +
          s"${res.frequent.size} frequent seasonal patterns",
        Vector("pattern", "k", "|SUP|", "#seasons"), rows))
    }
  }
}

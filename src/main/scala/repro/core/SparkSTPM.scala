package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Spark orchestration of FreqSTPfTS (DESIGN.md §5).
  *
  * Phase 1 (data transformation) runs as Catalyst DataFrame transforms:
  * symbolization → granule assignment → per-(series, granule) run-length
  * encoding into event instances. Phase 2 parallelism follows the
  * single-node-parallelizable shape: the candidate 2-event pair list is
  * partitioned and mined inside `mapPartitions` against a broadcast D_SEQ,
  * each partition running the same pruned STPM kernel; levels k >= 3
  * proceed on the driver over the merged HLH2. MI for A-STPM is computed
  * with Spark SQL aggregations over D_SYB.
  */
object SparkSTPM {

  // ------------------------------------------------------------------
  // Phase 1 — DataFrame pipeline
  // ------------------------------------------------------------------

  /** Lift locally generated raw series into a (series, pos, value) frame. */
  def rawDF(spark: SparkSession, raw: Vector[(String, Vector[Double])]): DataFrame = {
    import spark.implicits._
    raw.flatMap { case (id, vs) =>
      vs.iterator.zipWithIndex.map { case (v, i) => (id, i + 1, v) }
    }.toDF("series", "pos", "value")
  }

  /** Symbolize raw values with per-series ascending cut points (Def. 3.7):
    * symbol = number of cuts at or below the value, as a string.
    */
  def symbolize(raw: DataFrame, cutsBySeries: Map[String, Vector[Double]]): DataFrame = {
    val enc = udf { (series: String, value: Double) =>
      val cuts = cutsBySeries.getOrElse(series,
        throw new NoSuchElementException(s"no cuts for series $series"))
      var i = 0
      while (i < cuts.size && value >= cuts(i)) i += 1
      i.toString
    }
    raw.select(col("series"), col("pos"), enc(col("series"), col("value")).as("symbol"))
  }

  /** Sequence mapping g: X_S →_m H plus run-length encoding (Defs.
    * 3.11–3.12): one output row per event instance —
    * (series, granule, symbol, start, end) with fine positions.
    */
  def toInstances(sym: DataFrame, m: Int): DataFrame = {
    require(m >= 1, "granularity factor must be >= 1")
    val w = Window.partitionBy("series").orderBy("pos")
    sym
      .withColumn("granule", (((col("pos") - 1) / m).cast("int") + 1))
      .withColumn("newRun",
        when(lag("symbol", 1).over(w).isNull
          .or(lag("symbol", 1).over(w) =!= col("symbol"))
          .or(lag("granule", 1).over(w) =!= col("granule")), 1).otherwise(0))
      .withColumn("runId", sum("newRun").over(w))
      .groupBy(col("series"), col("granule"), col("runId"))
      .agg(
        first("symbol").as("symbol"),
        min("pos").as("start"),
        max("pos").as("end"))
      .drop("runId")
  }

  /** Materialize the instance frame into the local mining model. */
  def collectSeqDB(instances: DataFrame, m: Int): SeqDB = {
    val collected = instances
      .select("granule", "series", "symbol", "start", "end")
      .collect()
      .map(r => (r.getInt(0),
        Instance(Event(r.getString(1), r.getString(2)), Interval(r.getInt(3), r.getInt(4)))))
    val byGranule = collected.groupBy(_._1)
    val n = if (byGranule.isEmpty) 0 else byGranule.keys.max
    val rows = (1 to n).toVector.map { g =>
      GranuleRow(g, byGranule.getOrElse(g, Array.empty).map(_._2).toVector.sorted(Instance.ordering))
    }
    SeqDB(m, rows)
  }

  /** Materialize a symbolic frame into the local D_SYB model. */
  def collectSymbolicDB(sym: DataFrame): SymbolicDB = {
    val bySeries = sym.select("series", "pos", "symbol").collect()
      .map(r => (r.getString(0), r.getInt(1), r.getString(2)))
      .groupBy(_._1)
    SymbolicDB(bySeries.toVector.sortBy(_._1).map { case (id, rows) =>
      SymbolicSeries(id, rows.sortBy(_._2).map(_._3).toVector)
    })
  }

  // ------------------------------------------------------------------
  // Spark SQL mutual information (A-STPM's correlation stage)
  // ------------------------------------------------------------------

  /** Joint symbol counts for every ordered series pair sx < sy:
    * (sx, sy, x, y, cnt) — the sufficient statistics for NMI.
    */
  def jointCounts(sym: DataFrame): DataFrame = {
    val a = sym.select(col("series").as("sx"), col("pos").as("posx"), col("symbol").as("x"))
    val b = sym.select(col("series").as("sy"), col("pos").as("posy"), col("symbol").as("y"))
    a.join(b, col("posx") === col("posy"))
      .where(col("sx") < col("sy"))
      .groupBy("sx", "sy", "x", "y")
      .agg(count(lit(1)).as("cnt"))
  }

  /** Both NMI directions per series pair from the Spark joint counts.
    * Key (sx, sy) with sx < sy maps to (nmi(x;y), nmi(y;x)).
    */
  def nmiMatrix(sym: DataFrame): Map[(String, String), (Double, Double)] = {
    val rows = jointCounts(sym).collect()
      .map(r => ((r.getString(0), r.getString(1)), (r.getString(2), r.getString(3)), r.getLong(4)))
    rows.groupBy(_._1).map { case (pair, cells) =>
      val total = cells.map(_._3).sum.toDouble
      val joint = cells.map { case (_, (x, y), c) => ((x, y), c / total) }.toMap
      val px = joint.groupBy(_._1._1).map { case (x, m) => x -> m.values.sum }
      val py = joint.groupBy(_._1._2).map { case (y, m) => y -> m.values.sum }
      def entropy(p: Map[String, Double]) =
        -p.values.map(v => if (v > 0) v * math.log(v) / math.log(2) else 0.0).sum
      val mi = joint.map { case ((x, y), pxy) =>
        if (pxy > 0) pxy * math.log(pxy / (px(x) * py(y))) / math.log(2) else 0.0
      }.sum
      val hx = entropy(px); val hy = entropy(py)
      val fwd = if (hx <= 0) 0.0 else math.max(0.0, mi / hx)
      val bwd = if (hy <= 0) 0.0 else math.max(0.0, mi / hy)
      pair -> (fwd, bwd)
    }
  }

  // ------------------------------------------------------------------
  // Phase 2 — distributed mining
  // ------------------------------------------------------------------

  /** E-STPM with the level-2 candidate pair workload fanned out via
    * `mapPartitions` over a broadcast D_SEQ. Identical results to
    * [[STPM.mine]] (asserted by the test suite); parallelism defaults to
    * the cluster's default parallelism.
    */
  def mine(spark: SparkSession, db: SeqDB, cfg: STPMConfig,
           parallelism: Int = 0): MiningResult = {
    val sc = spark.sparkContext
    val parts = if (parallelism > 0) parallelism else sc.defaultParallelism
    val bcDb = sc.broadcast(db)
    val bcCfg = sc.broadcast(cfg)
    val exec: STPM.Level2Exec = (_, _, pairs) => {
      if (pairs.isEmpty) Vector.empty
      else {
        val indexed = pairs.zipWithIndex.map(_.swap)
        sc.parallelize(indexed, math.min(parts, pairs.size))
          .mapPartitions { it =>
            val localCfg = bcCfg.value
            // One HLH1 per partition, rebuilt from the broadcast database —
            // the per-partition pruned mining kernel of the repro plan.
            lazy val hlh1 = HLH1.build(bcDb.value, localCfg.season, localCfg.apriori)
            it.map { case (idx, (e0, e1, sup)) =>
              (idx, STPM.minePairData(hlh1, e0, e1, sup, localCfg))
            }
          }
          .collect()
          .sortBy(_._1)
          .map(_._2)
          .toVector
      }
    }
    try STPM.mineFiltered(db, cfg, None, None, Some(exec))
    finally { bcDb.destroy(); bcCfg.destroy() }
  }
}

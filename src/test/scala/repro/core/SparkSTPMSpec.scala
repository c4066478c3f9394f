package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.SeasonalGen

/** Spark Phase-1 pipeline and distributed mining, cross-checked against the
  * local kernel and (for every DataFrame-producing step) against DuckDB via
  * the Oracle.
  */
class SparkSTPMSpec extends SparkSpec {

  private lazy val spec = SeasonalGen.Spec(
    name = "spark-test", nSeries = 4, nCoarse = 60, m = 4,
    planted = Vector(SeasonalGen.Planted(
      Vector(SeasonalGen.Participant(0, 1, 4), SeasonalGen.Participant(1, 2, 4)),
      period = 12, window = 4)),
    noise = 0.05, seed = 3L)
  private lazy val raw = SeasonalGen.rawSeries(spec)
  private lazy val rawDf = SparkSTPM.rawDF(spark, raw).cache()
  private lazy val cuts = raw.map { case (id, _) => id -> SeasonalGen.Cuts }.toMap
  private lazy val symDf = SparkSTPM.symbolize(rawDf, cuts).cache()
  private lazy val instDf = SparkSTPM.toInstances(symDf, spec.m).cache()

  test("rawDF has one row per (series, pos)") {
    assert(rawDf.count() == spec.nSeries.toLong * spec.fineLength)
    assert(rawDf.select("series").distinct().count() == spec.nSeries)
  }

  test("symbolize matches the local Symbolizer (oracle: threshold count)") {
    val localSyb = SeasonalGen.symbolic(spec)
    val sparkSyms = symDf.collect()
      .map(r => ((r.getString(0), r.getInt(1)), r.getString(2))).toMap
    for (s <- localSyb.series; (sym, i) <- s.symbols.zipWithIndex)
      assert(sparkSyms((s.id, i + 1)) == sym, s"series ${s.id} pos ${i + 1}")
  }

  test("oracle: symbol histogram per series matches DuckDB") {
    val agg = symDf.groupBy("series", "symbol").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(agg,
      "SELECT series, symbol, COUNT(*) AS cnt FROM sym GROUP BY series, symbol",
      "sym" -> symDf)
  }

  test("oracle: run-length encoding matches a DuckDB window-function query") {
    val sql =
      """
      WITH base AS (
        SELECT series, CAST(pos AS INT) AS p, symbol,
               ((CAST(pos AS INT) - 1) // 4) + 1 AS granule
        FROM sym
      ), runs AS (
        SELECT series, p, symbol, granule,
               CASE WHEN LAG(symbol) OVER w IS DISTINCT FROM symbol
                      OR LAG(granule) OVER w IS DISTINCT FROM granule
                    THEN 1 ELSE 0 END AS new_run
        FROM base
        WINDOW w AS (PARTITION BY series ORDER BY p)
      ), ids AS (
        SELECT series, p, symbol, granule,
               SUM(new_run) OVER (PARTITION BY series ORDER BY p) AS run_id
        FROM runs
      )
      SELECT series, granule, symbol,
             MIN(p) AS start, MAX(p) AS "end"
      FROM ids GROUP BY series, granule, symbol, run_id
      """
    Oracle.assertEquivalent(
      instDf.select("series", "granule", "symbol", "start", "end"),
      sql, "sym" -> symDf)
  }

  test("collectSeqDB equals the local SequenceDB.build") {
    val local = SequenceDB.build(SeasonalGen.symbolic(spec), spec.m)
    val viaSpark = SparkSTPM.collectSeqDB(instDf, spec.m)
    assert(viaSpark.size == local.size)
    for ((a, b) <- viaSpark.rows.zip(local.rows))
      assert(a == b, s"granule ${b.pos} differs")
  }

  test("collectSymbolicDB equals the local symbolic database") {
    val local = SeasonalGen.symbolic(spec)
    val viaSpark = SparkSTPM.collectSymbolicDB(symDf)
    assert(viaSpark == local)
  }

  test("oracle: MI joint counts match DuckDB") {
    val jc = SparkSTPM.jointCounts(symDf)
    val sql =
      """
      SELECT a.series AS sx, b.series AS sy, a.symbol AS x, b.symbol AS y,
             COUNT(*) AS cnt
      FROM sym a JOIN sym b ON a.pos = b.pos AND a.series < b.series
      GROUP BY a.series, b.series, a.symbol, b.symbol
      """
    Oracle.assertEquivalent(jc, sql, "sym" -> symDf)
  }

  test("Spark NMI matrix equals the local MutualInformation") {
    val local = SeasonalGen.symbolic(spec)
    val matrix = SparkSTPM.nmiMatrix(symDf)
    for {
      i <- local.series.indices
      j <- (i + 1) until local.series.size
    } {
      val x = local.series(i); val y = local.series(j)
      val (fwd, bwd) = matrix((x.id, y.id))
      assert(math.abs(fwd - MutualInformation.nmi(x, y)) < 1e-9, s"(${x.id},${y.id}) fwd")
      assert(math.abs(bwd - MutualInformation.nmi(y, x)) < 1e-9, s"(${x.id},${y.id}) bwd")
    }
  }

  test("distributed mining equals the local kernel on the paper example") {
    val db = Fixtures.tableIV
    val cfg = Fixtures.stpmCfg.copy(maxK = 3)
    val local = STPM.mine(db, cfg)
    val dist = SparkSTPM.mine(spark, db, cfg, parallelism = 4)
    assert(dist.keys == local.keys)
    val localByKey = local.frequent.map(p => p.key -> p).toMap
    for (p <- dist.frequent) {
      assert(p.support == localByKey(p.key).support)
      assert(p.seasons == localByKey(p.key).seasons)
    }
  }

  test("distributed mining equals the local kernel on generated data") {
    val db = SparkSTPM.collectSeqDB(instDf, spec.m)
    val cfg = STPMConfig(SeasonCfg(2, 3, 4, 20, 2), maxK = 3)
    val local = STPM.mine(db, cfg)
    val dist = SparkSTPM.mine(spark, db, cfg, parallelism = 8)
    assert(local.frequent.nonEmpty)
    assert(dist.keys == local.keys)
  }
}

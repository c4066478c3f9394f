package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core.Relations.RelCfg

object TestData {
  /** Random small symbolic database, deterministic in the seed. Sparse
    * activations (default p = 0.15) so support sets have gaps and seasons
    * actually form.
    */
  def randomSyb(nSeries: Int, length: Int, seed: Long, pOne: Double = 0.15): SymbolicDB = {
    val rnd = new Random(seed)
    SymbolicDB((0 until nSeries).toVector.map { s =>
      SymbolicSeries(s"S$s",
        Vector.fill(length)(if (rnd.nextDouble() < pOne) "1" else "0"))
    })
  }

  def randomDb(nSeries: Int, length: Int, m: Int, seed: Long): SeqDB =
    SequenceDB.build(randomSyb(nSeries, length, seed), m)

  /** Lenient thresholds so small random data yields patterns. */
  val lenient: SeasonCfg = SeasonCfg(maxPeriod = 3, minDensity = 2,
    distMin = 1, distMax = 30, minSeason = 2)
}

class STPMSpec extends AnyFunSuite {
  import TestData._

  test("pruning invariance: all four flag combinations agree (soundness)") {
    for (seed <- 1L to 4L) {
      val db = randomDb(3, 60, 3, seed)
      val base = STPMConfig(lenient, maxK = 3)
      val results = for {
        ap <- Seq(true, false)
        tr <- Seq(true, false)
      } yield ((ap, tr), STPM.mine(db, base.copy(apriori = ap, transitivity = tr)).keys)
      val reference = results.head._2
      for (((flags, keys)) <- results.tail)
        assert(keys == reference, s"seed=$seed flags=$flags diverged:\n" +
          s"  only-in-ref: ${(reference -- keys).map(_.render).take(5)}\n" +
          s"  only-in-run: ${(keys -- reference).map(_.render).take(5)}")
    }
  }

  test("pruned runs do no more work than unpruned runs") {
    val db = randomDb(3, 90, 3, 7L)
    val base = STPMConfig(lenient, maxK = 3)
    val all = STPM.mine(db, base)
    val none = STPM.mine(db, base.copy(apriori = false, transitivity = false))
    assert(all.stats.relationChecks <= none.stats.relationChecks)
  }

  test("self-pair patterns: an event relates to itself across runs") {
    // Active granules 1,2,5,6 toggle "1,0,1" (two X:1 runs per granule);
    // granules 3,4,7,8 are silent — two seasons {1,2} and {5,6}.
    val active = Vector("1", "0", "1"); val silent = Vector("0", "0", "0")
    val syb = SymbolicDB(Vector(SymbolicSeries("X",
      Vector(active, active, silent, silent, active, active, silent, silent).flatten)))
    val db = SequenceDB.build(syb, 3)
    val cfg = STPMConfig(SeasonCfg(2, 2, 1, 10, 2), maxK = 2)
    val res = STPM.mine(db, cfg)
    val selfFollows = res.frequentOfSize(2).find(p =>
      p.key.events == Vector(Event("X", "1"), Event("X", "1")))
    assert(selfFollows.isDefined, res.frequent.map(_.key.render).mkString(", "))
    assert(selfFollows.get.key.rels == Vector((Rel.Follows, true)))
    assert(selfFollows.get.support == Vector(1, 2, 5, 6))
  }

  test("3-event patterns are found with consistent sub-patterns") {
    // Staggered spans in active granules (two seasons: {1,2,3}, {7,8,9}).
    val activeGranules = Set(1, 2, 3, 7, 8, 9)
    def series(id: String, pattern: Vector[String]) =
      SymbolicSeries(id, (1 to 12).toVector.flatMap(g =>
        if (activeGranules(g)) pattern else Vector.fill(4)("0")))
    val syb = SymbolicDB(Vector(
      series("A", Vector("1", "1", "1", "1")),
      series("B", Vector("0", "1", "1", "1")),
      series("C", Vector("0", "0", "1", "1"))))
    val db = SequenceDB.build(syb, 4)
    val cfg = STPMConfig(SeasonCfg(2, 2, 1, 10, 2), maxK = 3)
    val res = STPM.mine(db, cfg)
    val k3 = res.frequentOfSize(3)
    assert(k3.nonEmpty, res.frequent.map(_.key.render).mkString(", "))
    // A [1,4] contains B [2,4] contains C [3,4] in every active granule.
    val key = PatternKey(
      Vector(Event("A", "1"), Event("B", "1"), Event("C", "1")),
      Vector((Rel.Contains, true), (Rel.Contains, true), (Rel.Contains, true)))
    assert(k3.exists(_.key == key), k3.map(_.key.render).mkString(", "))
  }

  test("incremental pattern keys equal direct ofOccurrence computation") {
    val db = randomDb(3, 60, 3, 11L)
    val cfg = STPMConfig(lenient, maxK = 3)
    val hlh1 = HLH1.build(db, cfg.season, apriori = true)
    var prev: Option[HLHk] = None
    for (k <- 2 to 3) {
      val stats = new MiningStats
      val hlhk = STPM.mineLevel(db, hlh1, prev, k, cfg, stats, None)
      for (((p, g), occs) <- hlhk.ghk; t <- occs)
        assert(PatternKey.ofOccurrence(p.events, t, cfg.rel) == p,
          s"occurrence $t of ${p.render} at granule $g disagrees")
      prev = Some(hlhk)
    }
  }

  test("maxK = 1 mines only single events") {
    val db = randomDb(2, 30, 3, 3L)
    val res = STPM.mine(db, STPMConfig(lenient, maxK = 1))
    assert(res.frequent.forall(_.k == 1))
  }

  test("impossible thresholds yield no patterns") {
    val db = randomDb(2, 30, 3, 3L)
    val cfg = STPMConfig(SeasonCfg(1, 10, 1, 2, 99))
    assert(STPM.mine(db, cfg).frequent.isEmpty)
  }

  test("every reported support set is sorted, distinct, non-empty") {
    val db = randomDb(4, 90, 3, 5L)
    val res = STPM.mine(db, STPMConfig(lenient, maxK = 3))
    for (fp <- res.frequent) {
      assert(fp.support.nonEmpty)
      assert(fp.support == fp.support.distinct.sorted)
      assert(fp.support.last <= db.size)
    }
  }

  test("epsilon changes relation labels, not soundness") {
    val db = randomDb(3, 60, 4, 9L)
    for (eps <- 0 to 2) {
      val cfg = STPMConfig(lenient, rel = RelCfg(epsilon = eps), maxK = 2)
      val res = STPM.mine(db, cfg)
      for (fp <- res.frequent)
        assert(Seasonality.isFrequentSeasonal(fp.support, lenient))
    }
  }

  test("intersectSorted and containsSorted basics") {
    assert(STPM.intersectSorted(Vector(1, 3, 5, 7), Vector(3, 4, 5, 9)) == Vector(3, 5))
    assert(STPM.intersectSorted(Vector.empty, Vector(1)) == Vector.empty)
    assert(STPM.containsSorted(Vector(1, 3, 5), 3))
    assert(!STPM.containsSorted(Vector(1, 3, 5), 4))
    assert(!STPM.containsSorted(Vector.empty, 1))
  }
}

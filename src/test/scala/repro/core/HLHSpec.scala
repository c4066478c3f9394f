package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HLHSpec extends AnyFunSuite {
  private val db = Fixtures.tableIV
  private val cfg = Fixtures.exampleCfg

  test("HLH1 without pruning indexes every event") {
    val h = HLH1.build(db, cfg, apriori = false)
    assert(h.eh.size == 10)
    assert(h.candidates == h.candidates.sorted)
  }

  test("HLH1 with pruning keeps only candidates") {
    val h = HLH1.build(db, cfg, apriori = true)
    assert(h.eh.size == 8)
    assert(!h.eh.contains(Event("M", "0")))
    assert(!h.eh.contains(Event("N", "0")))
  }

  test("support sets match a direct scan") {
    val h = HLH1.build(db, cfg, apriori = false)
    for ((e, sup) <- h.eh)
      assert(sup == db.rows.filter(_.events.contains(e)).map(_.pos))
  }

  test("GH holds the instances per granule") {
    val h = HLH1.build(db, cfg, apriori = true)
    val c1 = Event("C", "1")
    assert(h.instancesAt(c1, 1) == Vector(Instance(c1, Interval(1, 2))))
    assert(h.instancesAt(c1, 4).isEmpty) // C:1 does not occur at H4
    assert(h.instancesAt(Event("Z", "9"), 1).isEmpty)
  }

  test("entry counts are positive and additive") {
    val h1 = HLH1.build(db, cfg, apriori = true)
    assert(h1.entryCount > 0)
    val stats = new MiningStats
    val h2 = STPM.mineLevel(db, h1, None, 2, Fixtures.stpmCfg, stats, None)
    assert(h2.entryCount > 0)
    assert(h2.groups.nonEmpty && h2.patterns.nonEmpty)
  }

  test("HLHk pattern events feed the transitivity filter") {
    val h1 = HLH1.build(db, cfg, apriori = true)
    val stats = new MiningStats
    val h2 = STPM.mineLevel(db, h1, None, 2, Fixtures.stpmCfg, stats, None)
    val pe = h2.patternEvents
    assert(pe.nonEmpty)
    assert(pe.subsetOf(h1.candidates.toSet))
    for (p <- h2.patterns; e <- p.events) assert(pe.contains(e))
  }

  test("HLHk support lookups") {
    val h1 = HLH1.build(db, cfg, apriori = true)
    val stats = new MiningStats
    val h2 = STPM.mineLevel(db, h1, None, 2, Fixtures.stpmCfg, stats, None)
    for (p <- h2.patterns) {
      val sup = h2.support(p)
      assert(sup.nonEmpty && sup == sup.sorted)
      for (g <- sup) assert(h2.occurrencesAt(p, g).nonEmpty)
    }
    assert(h2.support(PatternKey.single(Event("Z", "1"))).isEmpty)
  }
}

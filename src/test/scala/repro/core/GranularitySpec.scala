package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

/** Plain-scalacheck helper: run a Prop and assert it passed (the
  * scalatestplus bridge is not among the offline deps).
  */
trait PropSupport { self: AnyFunSuite =>
  def checkProp(prop: Prop, minTests: Int = 100): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}

class GranularitySpec extends AnyFunSuite with PropSupport {

  test("coarsePos folds m fine granules into one coarse granule") {
    assert(Granularity.coarsePos(1, 3) == 1)
    assert(Granularity.coarsePos(3, 3) == 1)
    assert(Granularity.coarsePos(4, 3) == 2)
    assert(Granularity.coarsePos(42, 3) == 14)
  }

  test("coarsePos with m = 1 is the identity") {
    for (p <- 1 to 20) assert(Granularity.coarsePos(p, 1) == p)
  }

  test("coarsePos rejects non-positive positions and factors") {
    intercept[IllegalArgumentException](Granularity.coarsePos(0, 3))
    intercept[IllegalArgumentException](Granularity.coarsePos(5, 0))
  }

  test("fineRange is the inverse image of coarsePos") {
    assert(Granularity.fineRange(1, 3) == ((1, 3)))
    assert(Granularity.fineRange(14, 3) == ((40, 42)))
    assert(Granularity.fineRange(2, 60) == ((61, 120)))
  }

  test("fineRange/coarsePos round-trip property") {
    checkProp(Prop.forAll(Gen.choose(1, 1000), Gen.choose(1, 60)) { (h: Int, m: Int) =>
      val (lo, hi) = Granularity.fineRange(h, m)
      hi - lo + 1 == m &&
        Granularity.coarsePos(lo, m) == h &&
        Granularity.coarsePos(hi, m) == h
    })
  }

  test("period between granules (Def. 3.5) — paper's Minute example") {
    assert(Granularity.period(6, 1) == 5)
    assert(Granularity.period(1, 6) == 5)
    assert(Granularity.period(7, 7) == 0)
  }

  test("coarseLength counts a trailing partial granule") {
    assert(Granularity.coarseLength(42, 3) == 14)
    assert(Granularity.coarseLength(43, 3) == 15)
    assert(Granularity.coarseLength(0, 3) == 0)
  }

  test("hierarchy cumulative factors — paper's Fig. 2 ladder") {
    val h = Hierarchy(Vector("5min" -> 1, "15min" -> 3, "1h" -> 4, "1d" -> 24))
    assert(h.factorOf("5min") == 1)
    assert(h.factorOf("15min") == 3)
    assert(h.factorOf("1h") == 12)
    assert(h.factorOf("1d") == 288)
    assert(h.levelNames == Vector("5min", "15min", "1h", "1d"))
  }

  test("hierarchy rejects a non-unit finest level and unknown levels") {
    intercept[IllegalArgumentException](Hierarchy(Vector("x" -> 2)))
    val h = Hierarchy(Vector("a" -> 1, "b" -> 2))
    intercept[IllegalArgumentException](h.factorOf("zzz"))
  }
}

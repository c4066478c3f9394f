package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

class SeasonalitySpec extends AnyFunSuite with PropSupport {

  private val cfg = Fixtures.exampleCfg // maxPeriod=2 minDensity=3 dist [4,10] minSeason=2

  test("near support sets split at gaps > maxPeriod — paper Fig. 3") {
    // P = C:1 >= D:1 with SUP = {1,2,3,7,8,11,12,14}.
    val ns = Seasonality.nearSupportSets(Vector(1, 2, 3, 7, 8, 11, 12, 14), 2)
    assert(ns.map(_.granules) == Vector(Vector(1, 2, 3), Vector(7, 8), Vector(11, 12, 14)))
    assert(ns.map(_.density) == Vector(3, 2, 3))
  }

  test("near support sets of an empty and singleton support") {
    assert(Seasonality.nearSupportSets(Vector.empty, 2).isEmpty)
    assert(Seasonality.nearSupportSets(Vector(5), 2).map(_.granules) == Vector(Vector(5)))
  }

  test("seasons filter by minDensity — Fig. 3 example keeps 2 of 3") {
    val seasons = Seasonality.seasonsOf(Vector(1, 2, 3, 7, 8, 11, 12, 14), cfg)
    assert(seasons.map(_.granules) == Vector(Vector(1, 2, 3), Vector(11, 12, 14)))
  }

  test("season distance — Def. 3.16 formula") {
    val s1 = NearSupport(Vector(1, 2, 3))
    val s2 = NearSupport(Vector(11, 12, 14))
    assert(Seasonality.dist(s1, s2) == 8) // |p(H3) - p(H11)|
  }

  test("C:1 >= D:1 is frequent seasonal under the example thresholds") {
    val sup = Vector(1, 2, 3, 7, 8, 11, 12, 14)
    assert(Seasonality.isFrequentSeasonal(sup, cfg))
    val Some(seasons) = Seasonality.frequentSeasons(sup, cfg)
    assert(Seasonality.seasonCount(seasons, cfg) == 2)
  }

  test("paper Sec. IV-B: M:1 >= N:1 support sets — 2 chained seasons") {
    // The paper's stated seasons of P: {H1,H3,H4,H5,H6} and {H10,H11,H13}.
    val sup = Vector(1, 3, 4, 5, 6, 10, 11, 13)
    val seasons = Seasonality.seasonsOf(sup, cfg)
    assert(seasons.map(_.granules) == Vector(Vector(1, 3, 4, 5, 6), Vector(10, 11, 13)))
    assert(Seasonality.dist(seasons(0), seasons(1)) == 4)
    assert(Seasonality.seasonCount(seasons, cfg) == 2)
    assert(Seasonality.isFrequentSeasonal(sup, cfg))
  }

  test("paper Sec. IV-B: event M:1 has a single season — not frequent") {
    val sup = Vector(1, 2, 3, 4, 5, 6, 8, 9, 10, 11, 13)
    val seasons = Seasonality.seasonsOf(sup, cfg)
    assert(seasons.size == 1)
    assert(!Seasonality.isFrequentSeasonal(sup, cfg))
  }

  test("distInterval breaks chains: distance outside [distMin, distMax]") {
    // Two dense seasons 20 apart under dist [4,10] — chain of length 1.
    val sup = Vector(1, 2, 3, 23, 24, 25)
    val seasons = Seasonality.seasonsOf(sup, cfg)
    assert(seasons.size == 2)
    assert(Seasonality.seasonCount(seasons, cfg) == 1)
    assert(!Seasonality.isFrequentSeasonal(sup, cfg))
  }

  test("longest chain is found among mixed distances") {
    // Seasons ending/starting: [1..3], [9..11], [17..19], [40..42]:
    // dists 6, 6, 21 → chain = 3.
    val sup = Vector(1, 2, 3, 9, 10, 11, 17, 18, 19, 40, 41, 42)
    val seasons = Seasonality.seasonsOf(sup, cfg)
    assert(seasons.size == 4)
    assert(Seasonality.seasonCount(seasons, cfg) == 3)
  }

  test("maxSeason — Eq. 1") {
    assert(Seasonality.maxSeason(8, 3) == 8.0 / 3)
    assert(Seasonality.isCandidate(6, cfg))  // 6/3 = 2 >= 2
    assert(!Seasonality.isCandidate(5, cfg)) // 5/3 < 2
  }

  test("maxSeason upper-bounds the true season count (Lemma-1 territory)") {
    val gen = for {
      n <- Gen.choose(0, 60)
      s <- Gen.listOfN(n, Gen.choose(1, 200))
    } yield s.distinct.sorted.toVector
    checkProp(Prop.forAll(gen) { sup =>
      val seasons = Seasonality.seasonsOf(sup, cfg)
      Seasonality.seasonCount(seasons, cfg) <= math.max(1,
        math.ceil(Seasonality.maxSeason(sup.size, cfg.minDensity)).toInt)
    })
  }

  test("anti-monotonicity: subset support never has smaller maxSeason (Lemma 1)") {
    val gen = for {
      n <- Gen.choose(1, 50)
      s <- Gen.listOfN(n, Gen.choose(1, 300))
    } yield s.distinct.sorted.toVector
    checkProp(Prop.forAll(gen, Gen.choose(0.0, 1.0)) { (sup, frac) =>
      val sub = sup.take((sup.size * frac).toInt) // any subset works; prefix is one
      Seasonality.maxSeason(sup.size, 3) >= Seasonality.maxSeason(sub.size, 3)
    })
  }

  test("near support sets partition the support set") {
    val gen = for {
      n <- Gen.choose(1, 80)
      s <- Gen.listOfN(n, Gen.choose(1, 400))
      p <- Gen.choose(1, 10)
    } yield (s.distinct.sorted.toVector, p)
    checkProp(Prop.forAll(gen) { case (sup, maxPer) =>
      val ns = Seasonality.nearSupportSets(sup, maxPer)
      val flat = ns.flatMap(_.granules)
      flat == sup &&
        ns.forall(s => s.granules.sliding(2).forall {
          case Seq(a, b) => b - a <= maxPer
          case _         => true
        }) &&
        ns.sliding(2).forall {
          case Seq(a, b) => b.first - a.last > maxPer
          case _         => true
        }
    })
  }

  test("SeasonCfg.fromPercent converts Table VI percentages with ceil") {
    val c = SeasonCfg.fromPercent(1460, 0.2, 0.5, 90, 270, 12)
    assert(c.maxPeriod == 3)   // ceil(2.92)
    assert(c.minDensity == 8)  // ceil(7.3)
    assert(c.distMin == 90 && c.distMax == 270 && c.minSeason == 12)
    val tiny = SeasonCfg.fromPercent(10, 0.2, 0.5, 1, 5, 2)
    assert(tiny.maxPeriod == 1 && tiny.minDensity == 1) // clamped to >= 1
  }

  test("config validation") {
    intercept[IllegalArgumentException](SeasonCfg(0, 1, 1, 2, 1))
    intercept[IllegalArgumentException](SeasonCfg(1, 0, 1, 2, 1))
    intercept[IllegalArgumentException](SeasonCfg(1, 1, 3, 2, 1))
    intercept[IllegalArgumentException](SeasonCfg(1, 1, 1, 2, 0))
  }

  test("strictly increasing support enforced") {
    intercept[IllegalArgumentException](Seasonality.nearSupportSets(Vector(3, 3), 2))
    intercept[IllegalArgumentException](Seasonality.nearSupportSets(Vector(5, 4), 2))
  }
}

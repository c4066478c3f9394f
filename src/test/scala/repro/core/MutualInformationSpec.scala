package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import MutualInformation._

class MutualInformationSpec extends AnyFunSuite with PropSupport {

  private def s(id: String, syms: String*) = SymbolicSeries(id, syms.toVector)
  private val Tol = 1e-9

  test("entropy of a fair binary series is 1 bit (Eq. 2)") {
    assert(math.abs(entropy(s("X", "0", "1", "0", "1")) - 1.0) < Tol)
  }

  test("entropy of a constant series is 0") {
    assert(entropy(s("X", "a", "a", "a")) == 0.0)
  }

  test("entropy of a uniform 4-symbol series is 2 bits") {
    assert(math.abs(entropy(s("X", "a", "b", "c", "d")) - 2.0) < Tol)
  }

  test("probs are empirical frequencies") {
    assert(probs(s("X", "1", "1", "0", "1")) == Map("1" -> 0.75, "0" -> 0.25))
  }

  test("joint probs over aligned positions") {
    val x = s("X", "1", "1", "0", "0")
    val y = s("Y", "1", "0", "1", "0")
    assert(jointProbs(x, y) == Map(
      ("1", "1") -> 0.25, ("1", "0") -> 0.25, ("0", "1") -> 0.25, ("0", "0") -> 0.25))
  }

  test("MI of independent series is 0; of identical series is H (Eq. 4)") {
    val x = s("X", "1", "1", "0", "0")
    val indep = s("Y", "1", "0", "1", "0")
    assert(math.abs(mi(x, indep)) < Tol)
    assert(math.abs(mi(x, x) - entropy(x)) < Tol)
  }

  test("chain rule: I(X;Y) = H(X) - H(X|Y) (Eqs. 3-4)") {
    val x = s("X", "1", "1", "0", "0", "1", "0")
    val y = s("Y", "1", "0", "0", "0", "1", "1")
    assert(math.abs(mi(x, y) - (entropy(x) - condEntropy(x, y))) < Tol)
  }

  test("NMI is in [0,1]; identical series give 1; constants give 0 (Eq. 5)") {
    val x = s("X", "1", "1", "0", "0")
    assert(math.abs(nmi(x, x) - 1.0) < Tol)
    assert(nmi(s("C", "a", "a", "a"), x) == 0.0)
    val y = s("Y", "1", "0", "1", "0")
    val v = nmi(x, y)
    assert(v >= 0.0 && v <= 1.0)
  }

  test("NMI is asymmetric when entropies differ") {
    val x = s("X", "1", "1", "1", "0", "0", "0", "0", "0")
    val y = s("Y", "1", "1", "0", "0", "1", "1", "0", "0")
    val fwd = nmi(x, y); val bwd = nmi(y, x)
    // I is symmetric, the normalizers H(X) != H(Y) are not.
    assert(math.abs(mi(x, y) - mi(y, x)) < Tol)
    assert(entropy(x) != entropy(y))
    assert(math.abs(fwd - bwd) > 1e-12 || mi(x, y) == 0.0)
  }

  test("property: 0 <= I(X;Y) <= min(H(X), H(Y))") {
    val gen = Gen.listOfN(40, Gen.oneOf("0", "1", "2")).map(_.toVector)
    checkProp(Prop.forAll(gen, gen) { (xs, ys) =>
      val x = SymbolicSeries("X", xs); val y = SymbolicSeries("Y", ys)
      val i = mi(x, y)
      i >= -Tol && i <= math.min(entropy(x), entropy(y)) + Tol
    }, minTests = 50)
  }

  test("muForEventPair: case split at rho = 1/e (Eq. 14)") {
    // Small rho → case 1: μ = 1 - λ2 / (e·ln2·log2(1/λ1)).
    val mu1 = muForEventPair(lambda1 = 0.25, lambda2 = 0.5,
      dseqSize = 10000, minSeason = 2, minDensity = 2)
    val expected1 = 1.0 - 0.5 / (math.E * math.log(2.0) * 2.0)
    assert(math.abs(mu1 - expected1) < 1e-12)
    // Large rho → case 2.
    val mu2 = muForEventPair(lambda1 = 0.25, lambda2 = 0.5,
      dseqSize = 100, minSeason = 10, minDensity = 10)
    val rho = 10.0 * 10 / (0.5 * 100)
    val expected2 = 1.0 - rho * 0.5 * (math.log(rho) / math.log(2)) /
      (math.log(2.0) * (math.log(0.25) / math.log(2)))
    assert(math.abs(mu2 - expected2) < 1e-12)
    assert(mu2 > 1.0) // impossible demand → pair pruned
  }

  test("muForEventPair: degenerate single-symbol series demands the impossible") {
    assert(muForEventPair(1.0, 0.5, 100, 2, 2).isPosInfinity)
  }

  test("muForSeriesPair takes the minimum over event pairs and directions") {
    val x = s("X", "1", "1", "0", "0", "1", "0")
    val y = s("Y", "1", "0", "0", "0", "1", "1")
    val mu = muForSeriesPair(x, y, dseqSize = 6, minSeason = 1, minDensity = 1)
    val candidates = for {
      (a, b) <- Seq((x, y), (y, x))
      l2 <- probs(b).values
    } yield muForEventPair(probs(a).values.min, l2, 6, 1, 1)
    assert(mu == candidates.min)
  }

  test("Theorem 1 bound is consistent with Corollary 1.1 (case 1)") {
    // If NMI >= μ with μ from Eq. 14 case 1, the bound must be >= minSeason.
    val l1 = 0.3; val l2 = 0.4; val dseq = 5000
    val minSeason = 3; val minDensity = 4
    val mu = muForEventPair(l1, l2, dseq, minSeason, minDensity)
    val rho = minSeason.toDouble * minDensity / (l2 * dseq)
    assert(rho <= 1.0 / math.E)
    val bound = maxSeasonLowerBound(l1, l2, mu, dseq, minDensity)
    assert(bound.isDefined)
    assert(bound.get >= minSeason - 1e-6,
      s"bound ${bound.get} < minSeason $minSeason")
  }

  test("Theorem 1 bound grows with μ; undefined past the W branch point") {
    val bounds = Vector(0.9, 0.95, 0.99).map(mu =>
      maxSeasonLowerBound(0.3, 0.4, mu, 1000, 3).get)
    assert(bounds == bounds.sorted)
    // Small μ pushes the W argument below -1/e — bound undefined.
    assert(maxSeasonLowerBound(0.3, 0.4, 0.5, 1000, 3).isEmpty)
  }

  test("correlated() applies Def. 5.4") {
    val x = s("X", "1", "1", "0", "0")
    assert(correlated(x, x, 0.99))
    val indep = s("Y", "1", "0", "1", "0")
    assert(!correlated(x, indep, 0.01))
  }

  test("symbolic DB alignment is enforced") {
    intercept[IllegalArgumentException](SymbolicDB(Vector(
      s("A", "1", "0"), s("B", "1"))))
    intercept[IllegalArgumentException](jointProbs(s("A", "1", "0"), s("B", "1")))
  }
}

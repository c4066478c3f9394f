package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

class LambertWSpec extends AnyFunSuite with PropSupport {

  private val Tol = 1e-9

  test("known values of the principal branch") {
    assert(math.abs(LambertW.w0(0.0)) < Tol)
    assert(math.abs(LambertW.w0(math.E) - 1.0) < Tol)
    assert(math.abs(LambertW.w0(2.0 * math.exp(2.0)) - 2.0) < 1e-8)
    assert(math.abs(LambertW.w0(-1.0 / math.E) + 1.0) < 1e-4) // branch point
  }

  test("known values of the secondary branch") {
    assert(math.abs(LambertW.wm1(-math.exp(-1.0)) + 1.0) < 1e-4)
    assert(math.abs(LambertW.wm1(-2.0 * math.exp(-2.0)) + 2.0) < 1e-8)
    assert(math.abs(LambertW.wm1(-3.0 * math.exp(-3.0)) + 3.0) < 1e-8)
  }

  test("domain checks") {
    intercept[IllegalArgumentException](LambertW.w0(-1.0))
    intercept[IllegalArgumentException](LambertW.wm1(0.1))
    intercept[IllegalArgumentException](LambertW.wm1(-1.0))
  }

  test("property: W0 inverts w·e^w on the positive domain") {
    checkProp(Prop.forAll(Gen.choose(0.0, 50.0)) { z =>
      val w = LambertW.w0(z)
      math.abs(w * math.exp(w) - z) <= 1e-8 * (1.0 + z)
    })
  }

  test("property: W0 inverts w·e^w on [-1/e, 0)") {
    checkProp(Prop.forAll(Gen.choose(-1.0 / math.E + 1e-6, -1e-9)) { z =>
      val w = LambertW.w0(z)
      w >= -1.0 - 1e-9 && math.abs(w * math.exp(w) - z) <= 1e-6
    })
  }

  test("property: W-1 inverts w·e^w and stays below -1") {
    checkProp(Prop.forAll(Gen.choose(-1.0 / math.E + 1e-6, -1e-6)) { z =>
      val w = LambertW.wm1(z)
      w <= -1.0 + 1e-9 && math.abs(w * math.exp(w) - z) <= 1e-6
    })
  }

  test("monotonicity of W0") {
    val zs = Vector(-0.3, -0.1, 0.0, 0.5, 1.0, 5.0, 100.0)
    val ws = zs.map(LambertW.w0)
    assert(ws == ws.sorted)
  }
}

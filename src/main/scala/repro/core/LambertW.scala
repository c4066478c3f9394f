package repro.core

/** The Lambert W function (Corless et al. 1996), needed by the lower bound
  * of Theorem 1. `w0` is the principal branch on [-1/e, ∞); `wm1` is the
  * secondary real branch on [-1/e, 0).
  *
  * Halley's iteration from a branch-appropriate initial guess; converges to
  * ~1e-12 in a handful of steps.
  */
object LambertW {
  private val InvE = -1.0 / math.E

  /** Principal branch W0(z), z >= -1/e. */
  def w0(z: Double): Double = {
    require(z >= InvE - 1e-12, s"W0 undefined for z=$z < -1/e")
    if (z == 0.0) 0.0
    else {
      val guess =
        if (z < 0) {
          // Series around the branch point -1/e.
          val p = math.sqrt(2.0 * (math.E * z + 1.0))
          -1.0 + p - p * p / 3.0
        } else if (z < math.E) z / math.E
        else { val l = math.log(z); l - math.log(l) }
      halley(z, guess)
    }
  }

  /** Secondary branch W-1(z), -1/e <= z < 0. */
  def wm1(z: Double): Double = {
    require(z >= InvE - 1e-12 && z < 0, s"W-1 undefined for z=$z")
    val guess = {
      val l = math.log(-z)
      if (z > -0.1) l - math.log(-l) else {
        val p = -math.sqrt(2.0 * (math.E * z + 1.0))
        -1.0 + p - p * p / 3.0
      }
    }
    halley(z, guess)
  }

  private def halley(z: Double, start: Double): Double = {
    var w = start
    var i = 0
    while (i < 64) {
      val ew = math.exp(w)
      val f = w * ew - z
      if (math.abs(f) < 1e-14 * (1.0 + math.abs(z))) return w
      val denom = ew * (w + 1.0) - (w + 2.0) * f / (2.0 * w + 2.0)
      val step = if (denom == 0.0) f / (ew * (w + 1.0) + 1e-300) else f / denom
      w -= step
      if (math.abs(step) < 1e-14 * (1.0 + math.abs(w))) return w
      i += 1
    }
    w
  }
}

package repro.core.interp

/** The 1-D spline interpolation formulas of Section 5.2 / 5.4.2.
  *
  * Offsets below are in units of the interpolation stride s: the known
  * neighbors of a point p sit at p±s and p±3s (even multiples of s, i.e.
  * points from higher interpolation levels), and — for the same-level
  * cubic pass — additionally at p±2s (points predicted earlier in the
  * same level).
  */
object Spline {

  /** Spline family selector. IDs are the on-disk encoding. */
  sealed abstract class Kind(val id: Int, val isCubic: Boolean)
  object Kind {
    /** Eq. 2 — first-order spline. */
    case object Linear extends Kind(0, isCubic = false)
    /** Eq. 6 — cubic spline with 'not-a-knot' boundary conditions (SZ3/QoZ). */
    case object NotAKnot extends Kind(1, isCubic = true)
    /** Eq. 8 — cubic spline with natural boundary conditions (new in HPEZ). */
    case object Natural extends Kind(2, isCubic = true)

    val all: Array[Kind] = Array(Linear, NotAKnot, Natural)
    def fromId(id: Int): Kind = all.find(_.id == id).getOrElse(
      throw new IllegalArgumentException(s"unknown spline id $id"))
  }

  /** Eq. 2: p = (d(i-1) + d(i+1)) / 2. */
  @inline def linear(dm1: Double, dp1: Double): Double = 0.5 * (dm1 + dp1)

  /** Eq. 6: not-a-knot cubic, neighbors at ±1 and ±3. */
  @inline def notAKnot(dm3: Double, dm1: Double, dp1: Double, dp3: Double): Double =
    (-dm3 + 9 * dm1 + 9 * dp1 - dp3) / 16.0

  /** Eq. 8: natural cubic, neighbors at ±1 and ±3. */
  @inline def natural(dm3: Double, dm1: Double, dp1: Double, dp3: Double): Double =
    (-3 * dm3 + 23 * dm1 + 23 * dp1 - 3 * dp3) / 40.0

  /** Eq. 13: same-level not-a-knot cubic, neighbors at ±1 and ±2. */
  @inline def sameLevelNotAKnot(dm2: Double, dm1: Double, dp1: Double, dp2: Double): Double =
    (-dm2 + 4 * dm1 + 4 * dp1 - dp2) / 6.0

  /** Eq. 14: same-level natural cubic, neighbors at ±1, ±2 and ±3. */
  @inline def sameLevelNatural(dm3: Double, dm2: Double, dm1: Double,
                               dp1: Double, dp2: Double, dp3: Double): Double =
    (3 * dm3 - 18 * dm2 + 46 * dm1 + 46 * dp1 - 18 * dp2 + 3 * dp3) / 62.0

  /** Right-edge extrapolation when p+s is outside the grid (only the two
    * left neighbors exist): linear extrapolation 2·d(i-1) − d(i-3), as in
    * SZ3's boundary handling.
    */
  @inline def extrapolate(dm3: Double, dm1: Double): Double = 1.5 * dm1 - 0.5 * dm3
}

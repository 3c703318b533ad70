package repro.core.interp

import org.scalatest.funsuite.AnyFunSuite

class SplineSpec extends AnyFunSuite {

  // Sample f at the stencil offsets used by each formula; the predicted
  // position is 0, neighbors at the given offsets.
  private def at(f: Double => Double, offs: Int*): Seq[Double] = offs.map(o => f(o.toDouble))

  test("linear spline is exact for affine functions") {
    val f = (x: Double) => 3.0 - 2.5 * x
    val Seq(m1, p1) = at(f, -1, 1)
    assert(math.abs(Spline.linear(m1, p1) - f(0)) < 1e-12)
  }

  test("not-a-knot cubic is exact for cubic polynomials") {
    val f = (x: Double) => 1.0 + 2 * x - 0.5 * x * x + 0.25 * x * x * x
    val Seq(m3, m1, p1, p3) = at(f, -3, -1, 1, 3)
    assert(math.abs(Spline.notAKnot(m3, m1, p1, p3) - f(0)) < 1e-12)
  }

  test("natural cubic is exact for affine functions") {
    val f = (x: Double) => -4.0 + 7 * x
    val Seq(m3, m1, p1, p3) = at(f, -3, -1, 1, 3)
    assert(math.abs(Spline.natural(m3, m1, p1, p3) - f(0)) < 1e-12)
  }

  test("natural cubic coefficients match Eq. 8") {
    // p = -3/40 d-3 + 23/40 d-1 + 23/40 d+1 - 3/40 d+3
    val v = Spline.natural(1.0, 2.0, 3.0, 4.0)
    val expected = (-3.0 * 1 + 23 * 2 + 23 * 3 - 3 * 4) / 40.0
    assert(math.abs(v - expected) < 1e-15)
  }

  test("not-a-knot coefficients match Eq. 6") {
    val v = Spline.notAKnot(1.0, 2.0, 3.0, 4.0)
    val expected = (-1.0 + 9 * 2 + 9 * 3 - 4) / 16.0
    assert(math.abs(v - expected) < 1e-15)
  }

  test("same-level not-a-knot matches Eq. 13 and is exact for quadratics") {
    val v = Spline.sameLevelNotAKnot(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(v - (-1.0 + 4 * 2 + 4 * 3 - 4) / 6.0) < 1e-15)
    val f = (x: Double) => 2.0 - x + 0.5 * x * x
    val Seq(m2, m1, p1, p2) = at(f, -2, -1, 1, 2)
    assert(math.abs(Spline.sameLevelNotAKnot(m2, m1, p1, p2) - f(0)) < 1e-12)
  }

  test("same-level natural matches Eq. 14 and is exact for affine") {
    val v = Spline.sameLevelNatural(1.0, 2.0, 3.0, 4.0, 5.0, 6.0)
    val expected = (3.0 * 1 - 18 * 2 + 46 * 3 + 46 * 4 - 18 * 5 + 3 * 6) / 62.0
    assert(math.abs(v - expected) < 1e-15)
    val f = (x: Double) => 9.0 - 4 * x
    val Seq(m3, m2, m1, p1, p2, p3) = at(f, -3, -2, -1, 1, 2, 3)
    assert(math.abs(Spline.sameLevelNatural(m3, m2, m1, p1, p2, p3) - f(0)) < 1e-12)
  }

  test("all formulas reproduce a constant") {
    assert(Spline.linear(5.0, 5.0) == 5.0)
    assert(math.abs(Spline.notAKnot(5, 5, 5, 5) - 5.0) < 1e-15)
    assert(math.abs(Spline.natural(5, 5, 5, 5) - 5.0) < 1e-15)
    assert(math.abs(Spline.sameLevelNotAKnot(5, 5, 5, 5) - 5.0) < 1e-15)
    assert(math.abs(Spline.sameLevelNatural(5, 5, 5, 5, 5, 5) - 5.0) < 1e-15)
    assert(math.abs(Spline.extrapolate(5, 5) - 5.0) < 1e-15)
  }

  test("weights of each formula sum to 1 (unbiasedness, Thm 5.1 premise)") {
    // constant-1 inputs must predict exactly 1
    assert(math.abs(Spline.linear(1, 1) - 1) < 1e-15)
    assert(math.abs(Spline.notAKnot(1, 1, 1, 1) - 1) < 1e-15)
    assert(math.abs(Spline.natural(1, 1, 1, 1) - 1) < 1e-15)
    assert(math.abs(Spline.sameLevelNotAKnot(1, 1, 1, 1) - 1) < 1e-15)
    assert(math.abs(Spline.sameLevelNatural(1, 1, 1, 1, 1, 1) - 1) < 1e-15)
  }

  test("extrapolate is exact for affine functions") {
    val f = (x: Double) => 2.0 + 3 * x
    assert(math.abs(Spline.extrapolate(f(-3), f(-1)) - f(0)) < 1e-12)
  }

  test("natural and not-a-knot cubics genuinely differ on generic smooth data") {
    val f = (x: Double) => math.exp(0.3 * x) + math.sin(0.7 * x + 1.0)
    val Seq(m3, m1, p1, p3) = at(f, -3, -1, 1, 3)
    val errNat = math.abs(Spline.natural(m3, m1, p1, p3) - f(0))
    val errNak = math.abs(Spline.notAKnot(m3, m1, p1, p3) - f(0))
    assert(errNat != errNak)
    assert(errNat < 0.1 && errNak < 0.1)
  }

  test("Kind.fromId round-trips") {
    Spline.Kind.all.foreach(k => assert(Spline.Kind.fromId(k.id) == k))
    intercept[IllegalArgumentException](Spline.Kind.fromId(9))
  }
}

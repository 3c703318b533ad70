package repro.wavelet

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGrids
import repro.core.{Compressor, GridData, Metrics}
import scala.util.Random

class Cdf97Spec extends AnyFunSuite {

  test("forward/inverse line is perfect reconstruction (even lengths)") {
    val rnd = new Random(1)
    for (n <- Seq(2, 4, 8, 16, 64, 100)) {
      val x = Array.fill(n)(rnd.nextDouble() * 10 - 5)
      val y = x.clone()
      Cdf97.forwardLine(y, n)
      Cdf97.inverseLine(y, n)
      (x zip y).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"n=$n") }
    }
  }

  test("forward/inverse line is perfect reconstruction (odd lengths)") {
    val rnd = new Random(2)
    for (n <- Seq(3, 5, 9, 17, 33, 99)) {
      val x = Array.fill(n)(rnd.nextDouble() * 10 - 5)
      val y = x.clone()
      Cdf97.forwardLine(y, n)
      Cdf97.inverseLine(y, n)
      (x zip y).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"n=$n") }
    }
  }

  test("details vanish for constant signals (vanishing moments)") {
    val x = Array.fill(32)(7.5)
    Cdf97.forwardLine(x, 32)
    for (i <- 1 until 32 by 2) assert(math.abs(x(i)) < 1e-9, s"detail $i = ${x(i)}")
  }

  test("details are tiny for linear ramps") {
    val x = Array.tabulate(64)(i => 2.0 * i + 3)
    Cdf97.forwardLine(x, 64)
    // interior details vanish for degree-1 polynomials (4 vanishing moments)
    for (i <- 5 until 59 by 2) assert(math.abs(x(i)) < 1e-8, s"detail $i = ${x(i)}")
  }

  test("deinterleave/interleave round-trip") {
    val rnd = new Random(3)
    for (n <- Seq(2, 5, 8, 33)) {
      val x = Array.fill(n)(rnd.nextDouble())
      val orig = x.clone()
      val tmp = new Array[Double](n)
      Cdf97.deinterleave(x, n, tmp)
      Cdf97.interleave(x, n, tmp)
      assert(x.toSeq == orig.toSeq)
    }
  }

  test("deinterleave puts approximations first") {
    val x = Array(0.0, 1.0, 2.0, 3.0, 4.0)
    val tmp = new Array[Double](5)
    Cdf97.deinterleave(x, 5, tmp)
    assert(x.toSeq == Seq(0.0, 2.0, 4.0, 1.0, 3.0))
  }

  test("multi-level 2-D forward/inverse reconstructs") {
    val g = TestGrids.smooth2D()
    val h = g.copyGrid
    val levels = Cdf97.levelsFor(g.dims)
    Cdf97.forward(h, levels)
    Cdf97.inverse(h, levels)
    assert(Metrics.maxAbsError(g.data, h.data) < 1e-9)
  }

  test("multi-level 3-D forward/inverse reconstructs (awkward dims)") {
    val g = TestGrids.smooth3D(17, 23, 29)
    val h = g.copyGrid
    val levels = Cdf97.levelsFor(g.dims)
    assert(levels >= 1)
    Cdf97.forward(h, levels)
    Cdf97.inverse(h, levels)
    assert(Metrics.maxAbsError(g.data, h.data) < 1e-9)
  }

  test("energy concentrates in the low-pass corner for smooth data") {
    val g = TestGrids.smooth3D(32, 32, 32)
    val h = g.copyGrid
    Cdf97.forward(h, 2)
    // low-pass box is 8x8x8 after 2 levels
    var inBox = 0.0
    var total = 0.0
    for (i <- 0 until 32; j <- 0 until 32; k <- 0 until 32) {
      val v = h(Array(i, j, k)); val e = v * v
      total += e
      if (i < 8 && j < 8 && k < 8) inBox += e
    }
    assert(inBox / total > 0.95, s"low-pass energy fraction ${inBox / total}")
  }

  test("levelsFor respects minimum extent") {
    assert(Cdf97.levelsFor(Array(256, 256, 256)) == 4)
    assert(Cdf97.levelsFor(Array(16, 16)) == 2)
    assert(Cdf97.levelsFor(Array(4, 64)) == 0)
  }
}

class SperrLikeSpec extends AnyFunSuite {

  private def checkBound(g: GridData, eps: Double): Double = {
    val c = SperrLike()
    val absEb = Compressor.absoluteBound(g, eps)
    val bytes = c.compress(g, absEb)
    val back = c.decompress(bytes)
    assert(back.dims.toSeq == g.dims.toSeq)
    val maxErr = Metrics.maxAbsError(g.data, back.data)
    assert(maxErr <= absEb, s"bound violated: $maxErr > $absEb")
    Metrics.compressionRatio(bytes.length.toLong, g.size.toLong)
  }

  test("3-D smooth data respects bound across eps") {
    val g = TestGrids.smooth3D()
    for (eps <- Seq(1e-2, 1e-3, 1e-4)) checkBound(g, eps)
  }

  test("2-D and small grids respect bound") {
    checkBound(TestGrids.smooth2D(), 1e-3)
    checkBound(TestGrids.smooth3D(5, 6, 7), 1e-3) // below transform minimum: 0 levels
  }

  test("noise respects bound (outlier-heavy)") { checkBound(TestGrids.noise3D(), 1e-3) }

  test("rough-dim data respects bound") { checkBound(TestGrids.roughDim0(), 1e-3) }

  test("high ratio on smooth data") {
    val cr = checkBound(TestGrids.smooth3D(48, 48, 48), 1e-2)
    assert(cr > 30, s"SPERR-like should compress smooth data well, got $cr")
  }

  test("integer data respects bound") { checkBound(TestGrids.ints2D(), 1e-2) }

  test("tighter bound means bigger stream") {
    val g = TestGrids.smooth3D(32, 32, 32)
    val c = SperrLike()
    val loose = c.compress(g, Compressor.absoluteBound(g, 1e-2)).length
    val tight = c.compress(g, Compressor.absoluteBound(g, 1e-4)).length
    assert(loose < tight)
  }
}

package repro.zfp

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGrids
import repro.core.{Compressor, GridData, Metrics}
import scala.util.Random

class ZfpLikeSpec extends AnyFunSuite {

  private def checkBound(g: GridData, eps: Double): Double = {
    val c = ZfpLike()
    val absEb = Compressor.absoluteBound(g, eps)
    val bytes = c.compress(g, absEb)
    val back = c.decompress(bytes)
    assert(back.dims.toSeq == g.dims.toSeq)
    val maxErr = Metrics.maxAbsError(g.data, back.data)
    assert(maxErr <= absEb, s"bound violated: $maxErr > $absEb")
    Metrics.compressionRatio(bytes.length.toLong, g.size.toLong)
  }

  test("lifting transform is exactly invertible on random ints") {
    val rnd = new Random(1)
    for (_ <- 0 until 200) {
      val a = Array.fill(4)(rnd.nextLong() % (1L << 42))
      val b = a.clone()
      ZfpLike.fwd4(b, 0, 1)
      ZfpLike.inv4(b, 0, 1)
      assert(b.toSeq == a.toSeq)
    }
  }

  test("lifting transform decorrelates a linear ramp (details are tiny)") {
    val a = Array(100L, 200L, 300L, 400L)
    ZfpLike.fwd4(a, 0, 1)
    // a(0) is the DC-ish mean, the rest are differences
    assert(math.abs(a(0) - 250L) <= 2)
    assert(math.abs(a(1)) <= 201)
  }

  test("sequency order starts at DC and is a permutation") {
    for (nd <- 1 to 3) {
      val o = ZfpLike.seqOrder(nd)
      assert(o(0) == 0)
      assert(o.sorted.toSeq == (0 until (1 << (2 * nd))).toSeq)
    }
  }

  test("plane coder round-trips random planes with persistent prefix") {
    val rnd = new Random(2)
    for (size <- Seq(4, 16, 64); _ <- 0 until 20) {
      val planes = Array.fill(10)(rnd.nextLong() & ((1L << size) - 1))
      val bw = new repro.core.BitWriter()
      var n = 0
      val ns = planes.map { p => n = ZfpLike.encodePlane(p, n, size, bw); n }
      val br = new repro.core.BitReader(bw.toBytes)
      var n2 = 0
      planes.zip(ns).foreach { case (p, nAfter) =>
        val (x, nn) = ZfpLike.decodePlane(n2, size, br)
        assert(x == p, s"plane mismatch size=$size")
        n2 = nn
        assert(n2 == nAfter)
      }
    }
  }

  test("3-D smooth data respects bound at several eps") {
    val g = TestGrids.smooth3D()
    for (eps <- Seq(1e-2, 1e-3, 1e-4)) checkBound(g, eps)
  }

  test("2-D and 1-D inputs respect bound") {
    checkBound(TestGrids.smooth2D(), 1e-3)
    checkBound(TestGrids.smooth1D(), 1e-3)
  }

  test("non-multiple-of-4 dims round-trip (edge padding)") {
    checkBound(TestGrids.smooth3D(17, 19, 23), 1e-3)
    checkBound(TestGrids.smooth3D(5, 6, 7), 1e-3)
  }

  test("noise input respects bound") { checkBound(TestGrids.noise3D(), 1e-3) }

  test("constant field compresses to near nothing") {
    val g = TestGrids.const3D()
    val cr = checkBound(g, 1e-3)
    assert(cr > 15, s"constant field CR should be large, got $cr")
  }

  test("all-zero field emits single-bit blocks") {
    val g = GridData.tabulate(Array(8, 8, 8))(_ => 0.0)
    val c = ZfpLike()
    val bytes = c.compress(g, 1e-3)
    assert(bytes.length < 64)
    assert(c.decompress(bytes).data.forall(_ == 0.0))
  }

  test("values spanning magnitudes (per-block exponents)") {
    val g = GridData.toFloatPrecision(GridData.tabulate(Array(16, 16, 16)) { c =>
      math.pow(10, (c(0) / 4) - 2) * math.sin(c(1) * 0.3 + c(2) * 0.2)
    })
    checkBound(g, 1e-3)
  }

  test("negative values round-trip") {
    val g = GridData.toFloatPrecision(GridData.tabulate(Array(12, 12))(c =>
      -5.0 + math.sin(c(0) * 0.5) - c(1) * 0.1))
    checkBound(g, 1e-4)
  }

  test("looser bound gives smaller output") {
    val g = TestGrids.smooth3D(32, 32, 32)
    val c = ZfpLike()
    val loose = c.compress(g, Compressor.absoluteBound(g, 1e-2)).length
    val tight = c.compress(g, Compressor.absoluteBound(g, 1e-5)).length
    assert(loose < tight)
  }

  test("integer data respects bound") { checkBound(TestGrids.ints2D(), 1e-3) }
}

package repro.svd

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGrids
import repro.core.{Compressor, GridData, Metrics}
import scala.util.Random

class JacobiSpec extends AnyFunSuite {

  private def checkEigen(a: Array[Array[Double]], tol: Double = 1e-8): Unit = {
    val n = a.length
    val e = Jacobi.eigen(a)
    // A v_j = λ_j v_j
    for (j <- 0 until n) {
      for (i <- 0 until n) {
        var av = 0.0
        for (k <- 0 until n) av += a(i)(k) * e.vectors(k)(j)
        assert(math.abs(av - e.values(j) * e.vectors(i)(j)) < tol,
          s"eigen residual at ($i,$j)")
      }
    }
    // orthonormality
    for (j1 <- 0 until n; j2 <- 0 until n) {
      var dot = 0.0
      for (i <- 0 until n) dot += e.vectors(i)(j1) * e.vectors(i)(j2)
      assert(math.abs(dot - (if (j1 == j2) 1.0 else 0.0)) < tol)
    }
    // descending order
    for (j <- 1 until n) assert(e.values(j - 1) >= e.values(j) - tol)
  }

  test("2x2 known eigenvalues") {
    val a = Array(Array(2.0, 1.0), Array(1.0, 2.0))
    val e = Jacobi.eigen(a)
    assert(math.abs(e.values(0) - 3.0) < 1e-10)
    assert(math.abs(e.values(1) - 1.0) < 1e-10)
    checkEigen(a)
  }

  test("diagonal matrix is its own decomposition") {
    val a = Array(Array(5.0, 0.0, 0.0), Array(0.0, 1.0, 0.0), Array(0.0, 0.0, 3.0))
    val e = Jacobi.eigen(a)
    assert(e.values.toSeq == Seq(5.0, 3.0, 1.0))
    checkEigen(a)
  }

  test("random symmetric matrices of several sizes") {
    val rnd = new Random(1)
    for (n <- Seq(3, 8, 20, 50)) {
      val m = Array.fill(n, n)(rnd.nextGaussian())
      val a = Array.tabulate(n, n)((i, j) => m(i)(j) + m(j)(i))
      checkEigen(a, tol = 1e-7)
    }
  }

  test("gram-style PSD matrix has non-negative eigenvalues") {
    val rnd = new Random(2)
    val n = 12
    val b = Array.fill(n, 30)(rnd.nextGaussian())
    val a = Array.tabulate(n, n)((i, j) => b(i).zip(b(j)).map { case (x, y) => x * y }.sum)
    val e = Jacobi.eigen(a)
    e.values.foreach(v => assert(v > -1e-8))
    checkEigen(a, tol = 1e-6)
  }

  test("rank-deficient matrix") {
    // rank-1: a = u uᵀ
    val u = Array(1.0, 2.0, 3.0)
    val a = Array.tabulate(3, 3)((i, j) => u(i) * u(j))
    val e = Jacobi.eigen(a)
    assert(math.abs(e.values(0) - 14.0) < 1e-9)
    assert(math.abs(e.values(1)) < 1e-9)
    assert(math.abs(e.values(2)) < 1e-9)
  }

  test("non-square input rejected") {
    intercept[IllegalArgumentException](Jacobi.eigen(Array(Array(1.0, 2.0))))
  }
}

class TthreshLikeSpec extends AnyFunSuite {

  private def checkBound(g: GridData, eps: Double): Double = {
    val c = TthreshLike()
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

  test("2-D data respects bound") { checkBound(TestGrids.smooth2D(), 1e-3) }

  test("awkward dims round-trip") { checkBound(TestGrids.smooth3D(11, 13, 17), 1e-3) }

  test("noise respects bound") { checkBound(TestGrids.noise3D(), 1e-3) }

  test("separable (low-rank) data compresses extremely well") {
    // rank-1 tensor: sin(i)·cos(j)·sin(k) — HOSVD's best case
    val g = GridData.toFloatPrecision(GridData.tabulate(Array(32, 32, 32)) { c =>
      math.sin(c(0) * 0.2) * math.cos(c(1) * 0.17) * math.sin(c(2) * 0.23)
    })
    val cr = checkBound(g, 1e-3)
    assert(cr > 50, s"rank-1 tensor should compress massively, got $cr")
  }

  test("integer data respects bound") { checkBound(TestGrids.ints2D(), 1e-2) }

  test("1-D input rejected") {
    intercept[IllegalArgumentException](TthreshLike().compress(TestGrids.smooth1D(), 1e-3))
  }

  test("tighter bound means bigger stream") {
    val g = TestGrids.smooth3D(24, 24, 24)
    val c = TthreshLike()
    val loose = c.compress(g, Compressor.absoluteBound(g, 1e-2)).length
    val tight = c.compress(g, Compressor.absoluteBound(g, 1e-4)).length
    assert(loose < tight)
  }
}

class FazLikeSpec extends AnyFunSuite {
  import repro.faz.FazLike

  private def checkBound(g: GridData, eps: Double): Double = {
    val c = FazLike()
    val absEb = Compressor.absoluteBound(g, eps)
    val bytes = c.compress(g, absEb)
    val back = c.decompress(bytes)
    val maxErr = Metrics.maxAbsError(g.data, back.data)
    assert(maxErr <= absEb + 1e-12, s"bound violated: $maxErr > $absEb")
    Metrics.compressionRatio(bytes.length.toLong, g.size.toLong)
  }

  test("3-D smooth data respects bound") { checkBound(TestGrids.smooth3D(), 1e-3) }

  test("rough-dim data respects bound (should pick interpolation+freezing)") {
    checkBound(TestGrids.roughDim0(), 1e-3)
  }

  test("2-D data respects bound") { checkBound(TestGrids.smooth2D(), 1e-3) }

  test("FAZ is at least as good as the better of its two pipelines on samples") {
    val g = TestGrids.smooth3D(48, 48, 48)
    val absEb = Compressor.absoluteBound(g, 1e-3)
    val faz = FazLike().compress(g, absEb).length
    val sperr = repro.wavelet.SperrLike().compress(g, absEb).length
    val hpez = repro.core.HPEZ(repro.core.tuning.AutoTuner.Target.PSNR).compress(g, absEb).length
    assert(faz <= math.max(sperr, hpez) + 1,
      s"FAZ $faz should not be worse than both pipelines ($sperr, $hpez)")
  }

  test("bad pipeline tag rejected") {
    intercept[IllegalArgumentException](FazLike().decompress(Array[Byte](7, 0, 0)))
  }
}

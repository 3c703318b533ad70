package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGrids

class HPEZSpec extends AnyFunSuite {

  private val compressors = Seq(HPEZ(), HPEZ.withoutFvfi(), QoZLike(), SZ3Like())

  private def checkBound(c: Compressor, g: GridData, eps: Double): Double = {
    val absEb = Compressor.absoluteBound(g, eps)
    val bytes = c.compress(g, absEb)
    val back = c.decompress(bytes)
    assert(back.dims.toSeq == g.dims.toSeq)
    val maxErr = Metrics.maxAbsError(g.data, back.data)
    assert(maxErr <= absEb + 1e-12, s"${c.name}: bound violated $maxErr > $absEb")
    Metrics.compressionRatio(bytes.length.toLong, g.size.toLong)
  }

  test("all interpolation compressors respect the bound on smooth 3-D data") {
    val g = TestGrids.smooth3D()
    compressors.foreach(c => checkBound(c, g, 1e-3))
  }

  test("all compressors respect the bound on rough-dim data") {
    val g = TestGrids.roughDim0()
    compressors.foreach(c => checkBound(c, g, 1e-3))
  }

  test("all compressors respect the bound on noise") {
    val g = TestGrids.noise3D()
    compressors.foreach(c => checkBound(c, g, 1e-2))
  }

  test("all compressors handle 2-D input") {
    val g = TestGrids.smooth2D()
    compressors.foreach(c => checkBound(c, g, 1e-3))
  }

  test("all compressors handle 1-D input") {
    val g = TestGrids.smooth1D()
    compressors.foreach(c => checkBound(c, g, 1e-3))
  }

  test("all compressors handle integer-valued input") {
    val g = TestGrids.ints2D()
    compressors.foreach(c => checkBound(c, g, 1e-3))
  }

  test("constant field compresses to almost nothing") {
    val g = TestGrids.const3D()
    val cr = checkBound(HPEZ(), g, 1e-3)
    assert(cr > 20, s"constant field CR should be large, got $cr")
  }

  test("tighter bound yields larger compressed size") {
    val g = TestGrids.smooth3D(32, 32, 32)
    val c = HPEZ()
    val loose = c.compress(g, Compressor.absoluteBound(g, 1e-2)).length
    val tight = c.compress(g, Compressor.absoluteBound(g, 1e-4)).length
    assert(tight > loose)
  }

  test("HPEZ compresses at least as well as QoZ-like on smooth data") {
    val g = TestGrids.smooth3D(48, 48, 48)
    val crH = checkBound(HPEZ(), g, 1e-3)
    val crQ = checkBound(QoZLike(), g, 1e-3)
    assert(crH >= crQ * 0.9, s"HPEZ $crH should be >= ~QoZ $crQ")
  }

  test("HPEZ beats QoZ-like substantially on rough-dim data (dimension freezing)") {
    val g = TestGrids.roughDim0(n0 = 16, n1 = 48, n2 = 48)
    val crH = checkBound(HPEZ(), g, 1e-4)
    val crQ = checkBound(QoZLike(), g, 1e-4)
    assert(crH > crQ, s"HPEZ $crH should beat QoZ $crQ via freezing")
  }

  test("fvfi variant produces identical compression ratio (only speed differs)") {
    val g = TestGrids.smooth3D(32, 32, 32)
    val b1 = HPEZ().compress(g, Compressor.absoluteBound(g, 1e-3))
    val b2 = HPEZ.withoutFvfi().compress(g, Compressor.absoluteBound(g, 1e-3))
    // The prediction/quantization outcome is identical per point; only the
    // stream ORDER differs, which shifts the Zstd stage by a few percent.
    assert(math.abs(b1.length - b2.length) <= b1.length * 0.05 + 32)
  }

  test("decompress rejects corrupt predictor tag") {
    val w = new ByteWriter()
    w.writeDouble(1e-3)
    w.writeByte(9)
    intercept[IllegalArgumentException](HPEZ().decompress(Lossless.compress(w.toBytes)))
  }

  test("compress rejects non-positive bound") {
    intercept[IllegalArgumentException](HPEZ().compress(TestGrids.smooth1D(), 0.0))
  }

  test("names are stable for benchmark tables") {
    assert(HPEZ().name == "HPEZ")
    assert(HPEZ.withoutFvfi().name == "HPEZ (w/o FVFI)")
    assert(QoZLike().name == "QoZ 1.1")
    assert(SZ3Like().name == "SZ 3.1")
  }
}

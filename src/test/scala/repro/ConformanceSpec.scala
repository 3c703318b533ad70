package repro

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Compressor, Metrics}
import repro.data.SciData
import repro.eval.Eval

/** Cross-codec conformance: every compressor in the registry must honour
  * the error-bound contract on every (miniature) dataset at several
  * bounds, produce self-describing streams, and behave monotonically in
  * the bound. This is the matrix the whole evaluation rests on.
  */
class ConformanceSpec extends AnyFunSuite {

  private val shrink = 0.15
  private val refs = SciData.allFloatFields(shrink).take(6) // one field per dataset

  for (codecName <- Eval.CompressorNames; ref <- refs) {
    test(s"$codecName respects the bound on $ref at 1e-3") {
      val g = SciData.generate(ref)
      val c = Eval.compressor(codecName)
      val absEb = Compressor.absoluteBound(g, 1e-3)
      val bytes = c.compress(g, absEb)
      val back = c.decompress(bytes)
      assert(back.dims.toSeq == g.dims.toSeq)
      val maxErr = Metrics.maxAbsError(g.data, back.data)
      assert(maxErr <= absEb + 1e-12, s"$maxErr > $absEb")
      assert(bytes.length < ref.rawBytes, "compressed should be smaller than fp32 raw")
    }
  }

  for (codecName <- Eval.CompressorNames) {
    test(s"$codecName is monotone in the error bound (Miranda mini)") {
      val g = SciData.generate(SciData.fields("Miranda", shrink).head)
      val c = Eval.compressor(codecName)
      val sizes = Seq(1e-2, 1e-3, 1e-4).map(e => c.compress(g, Compressor.absoluteBound(g, e)).length)
      assert(sizes(0) <= sizes(1) && sizes(1) <= sizes(2),
        s"sizes should grow as the bound tightens: $sizes")
    }
  }

  test("decompression is deterministic for every codec") {
    val g = SciData.generate(SciData.fields("JHTDB", shrink).head)
    for (codecName <- Eval.CompressorNames) {
      val c = Eval.compressor(codecName)
      val bytes = c.compress(g, Compressor.absoluteBound(g, 1e-3))
      val a = c.decompress(bytes)
      val b = c.decompress(bytes)
      assert(a.data.toSeq == b.data.toSeq, s"$codecName decompression not deterministic")
    }
  }

  test("streams are self-describing (fresh instance can decompress)") {
    val g = SciData.generate(SciData.fields("SCALE", shrink).head)
    for (codecName <- Eval.CompressorNames) {
      val bytes = Eval.compressor(codecName).compress(g, Compressor.absoluteBound(g, 1e-3))
      val back = Eval.compressor(codecName).decompress(bytes) // NEW instance
      assert(back.dims.toSeq == g.dims.toSeq)
    }
  }
}

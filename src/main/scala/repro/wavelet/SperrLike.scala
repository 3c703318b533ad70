package repro.wavelet

import repro.core._

/** SPERR-0.6-like wavelet compressor (Li, Lindstrom, Clyne, IPDPS'23) —
  * the paper's wavelet-transform-based high-ratio archetype.
  *
  * Pipeline: multi-level CDF 9/7 transform on the FULL input → uniform
  * scalar quantization of the coefficients → entropy coding
  * (Huffman + Zstd via [[repro.core.CoeffCodec]]) → reconstruction and
  * SPERR's outlier-correction pass, which stores explicit corrections for
  * every point violating the bound so the point-wise guarantee holds.
  *
  * The full-field transform plus the mandatory reconstruction during
  * compression make it markedly slower than the prediction-based
  * compressors — the paper's "high-ratio, low-speed" trade-off.
  */
final class SperrLike extends Compressor {

  override def name: String = "SPERR 0.6"

  /** Coefficient quantization step as a multiple of the error bound.
    * Step = 2e matches the ±e error profile of the prediction-based
    * compressors (step = e would over-deliver PSNR and waste rate); the
    * outlier pass mops up the tail either way.
    */
  private val StepFactor = 2.0

  override def compress(grid: GridData, absEb: Double): Array[Byte] = {
    require(absEb > 0, "absolute error bound must be positive")
    val step = absEb * StepFactor
    val levels = Cdf97.levelsFor(grid.dims)
    val work = grid.copyGrid
    Cdf97.forward(work, levels)
    val codes = new Array[Int](work.size)
    var i = 0
    while (i < codes.length) {
      val q = math.rint(work.data(i) / step)
      codes(i) = math.max(Int.MinValue.toDouble, math.min(Int.MaxValue.toDouble, q)).toInt
      work.data(i) = codes(i).toDouble * step
      i += 1
    }
    // reconstruct to find bound violations
    Cdf97.inverse(work, levels)
    val corrections = OutlierCorrection.encode(grid.data, work.data, absEb)

    val w = new ByteWriter()
    w.writeVarInt(grid.ndim.toLong)
    grid.dims.foreach(d => w.writeVarInt(d.toLong))
    w.writeDouble(absEb)
    w.writeDouble(step)
    w.writeByte(levels)
    w.writeBlob(CoeffCodec.encode(codes))
    w.writeBlob(corrections)
    Lossless.compress(w.toBytes)
  }

  override def decompress(bytes: Array[Byte]): GridData = {
    val r = new ByteReader(Lossless.decompress(bytes))
    val nd = r.readVarInt().toInt
    val dims = Array.fill(nd)(r.readVarInt().toInt)
    val absEb = r.readDouble()
    val step = r.readDouble()
    val levels = r.readByte()
    val codes = CoeffCodec.decode(r.readBlob())
    val corrections = r.readBlob()
    val grid = new GridData(dims, codes.map(_.toDouble * step))
    Cdf97.inverse(grid, levels)
    OutlierCorrection.apply(grid.data, corrections, absEb)
    grid
  }
}

object SperrLike { def apply(): SperrLike = new SperrLike }

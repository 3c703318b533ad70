package repro.core

import scala.collection.mutable.ArrayBuffer

/** SZ3-style linear error quantizer (Step 3 of the HPEZ pipeline, Fig. 1).
  *
  * For a value x with prediction p, the signed quantization index is
  * q = round((x - p) / (2e)); reconstruction is p + 2qe, which is within
  * the absolute bound e of x. Codes are shifted by `radius` so Huffman
  * sees non-negative symbols; code 0 is the escape for unpredictable
  * points, whose exact (float32) values are stored in a side list.
  *
  * Compression must continue predicting from RECONSTRUCTED values so that
  * decompression replays identically — [[quantize]] therefore returns the
  * reconstruction for the caller to write back into the working grid.
  */
final class LinearQuantizer(val eb: Double, val radius: Int = 32768) {
  require(eb > 0, s"error bound must be positive: $eb")
  private val twoEb = 2 * eb

  val codes: ArrayBuffer[Int] = ArrayBuffer.empty[Int]
  val outliers: ArrayBuffer[Double] = ArrayBuffer.empty[Double]

  /** Quantizes (value, prediction); records the code; returns the
    * reconstructed value the decompressor will produce.
    */
  def quantize(value: Double, pred: Double): Double = {
    val diff = value - pred
    val q = math.rint(diff / twoEb)
    if (math.abs(q) < radius - 1) {
      val recon = pred + q * twoEb
      if (math.abs(recon - value) <= eb) {   // guards fp rounding at bin edges
        codes += (q.toInt + radius)
        recon
      } else { escape(value) }
    } else { escape(value) }
  }

  private def escape(value: Double): Double = {
    codes += 0
    // float32 storage is exact for our inputs (see GridData doc).
    val v = value.toFloat.toDouble
    outliers += v
    v
  }

  def codesArray: Array[Int] = codes.toArray
  def outliersArray: Array[Double] = outliers.toArray
}

/** Decompression-side mirror: replays codes/outliers in the identical order. */
final class LinearDequantizer(val eb: Double, val radius: Int,
                              codes: Array[Int], outliers: Array[Double]) {
  private val twoEb = 2 * eb
  private var ci = 0
  private var oi = 0

  /** Reconstructs the next value given its prediction. */
  def next(pred: Double): Double = {
    val code = codes(ci); ci += 1
    if (code == 0) { val v = outliers(oi); oi += 1; v }
    else pred + (code - radius).toDouble * twoEb
  }

  def consumedCodes: Int = ci
}

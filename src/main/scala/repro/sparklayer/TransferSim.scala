package repro.sparklayer

/** The paper's parallel data-transfer time model (Section 7.2.4 / Fig. 14):
  * a dataset is augmented p times (one copy per core); each core
  * sequentially compresses / decompresses its copy while the compressed
  * bytes of all copies cross the inter-machine link at `linkSpeed`.
  *
  *   T = D / compSpeed  +  p·Z / linkSpeed  +  D / decompSpeed
  *
  * where D is the per-core raw size and Z the per-core compressed size.
  * The paper validates this approximation against its real 2048-core
  * Globus transfers; we drive it with the speeds and sizes measured on
  * our compressors (DESIGN.md §4, Table 5).
  */
object TransferSim {

  /** Measured per-compressor inputs for the model. */
  final case class Measured(rawBytes: Long, compressedBytes: Long,
                            compMBps: Double, decompMBps: Double)

  /** Total transfer time in seconds for `p` cores at `linkGBps` GB/s. */
  def timeSeconds(m: Measured, p: Int, linkGBps: Double): Double = {
    val mb = m.rawBytes.toDouble / 1e6
    val compTime = mb / m.compMBps
    val decompTime = mb / m.decompMBps
    val transferTime = p.toDouble * m.compressedBytes / (linkGBps * 1e9)
    compTime + transferTime + decompTime
  }

  /** Break-down of the three phases (for EXPERIMENTS.md reporting). */
  def breakdown(m: Measured, p: Int, linkGBps: Double): (Double, Double, Double) = {
    val mb = m.rawBytes.toDouble / 1e6
    (mb / m.compMBps, p.toDouble * m.compressedBytes / (linkGBps * 1e9), mb / m.decompMBps)
  }
}

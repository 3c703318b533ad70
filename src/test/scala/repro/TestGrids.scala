package repro

import repro.core.GridData
import scala.util.Random

/** Small synthetic grids shared by unit tests (fp32-exact values). */
object TestGrids {

  /** Smooth separable 3-D field. */
  def smooth3D(n0: Int = 20, n1 : Int = 24, n2: Int = 28): GridData =
    GridData.toFloatPrecision(GridData.tabulate(Array(n0, n1, n2)) { c =>
      math.sin(c(0) * 0.2) * math.cos(c(1) * 0.15) + 0.5 * math.sin(c(2) * 0.1)
    })

  /** Smooth 2-D field. */
  def smooth2D(n0: Int = 40, n1: Int = 48): GridData =
    GridData.toFloatPrecision(GridData.tabulate(Array(n0, n1)) { c =>
      math.exp(-((c(0) - 20.0) * (c(0) - 20.0) + (c(1) - 24.0) * (c(1) - 24.0)) / 200.0)
    })

  /** Smooth 1-D signal. */
  def smooth1D(n: Int = 200): GridData =
    GridData.toFloatPrecision(GridData.tabulate(Array(n))(c => math.sin(c(0) * 0.05) * 3))

  /** Field smooth along dims 1,2 but random along dim 0 — exercises
    * dynamic dimension freezing.
    */
  def roughDim0(n0: Int = 12, n1: Int = 24, n2: Int = 24, seed: Long = 42): GridData = {
    val rnd = new Random(seed)
    val offsets = Array.fill(n0)(rnd.nextDouble() * 10)
    GridData.toFloatPrecision(GridData.tabulate(Array(n0, n1, n2)) { c =>
      offsets(c(0)) + math.sin(c(1) * 0.2) * math.cos(c(2) * 0.2)
    })
  }

  /** Pure white noise — Lorenzo / outlier stress test. */
  def noise3D(n: Int = 12, seed: Long = 7): GridData = {
    val rnd = new Random(seed)
    GridData.toFloatPrecision(GridData.tabulate(Array(n, n, n))(_ => rnd.nextDouble()))
  }

  /** Constant field. */
  def const3D(n: Int = 10, v: Double = 3.5): GridData =
    GridData.tabulate(Array(n, n, n))(_ => v)

  /** Integer-valued field (scientific integer datasets). */
  def ints2D(n0: Int = 30, n1: Int = 30): GridData =
    GridData.tabulate(Array(n0, n1)) { c =>
      math.round(100 * math.sin(c(0) * 0.3) * math.cos(c(1) * 0.25) + 500).toDouble
    }
}

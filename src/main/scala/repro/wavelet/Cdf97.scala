package repro.wavelet

import repro.core.GridData

/** Multi-level CDF 9/7 wavelet transform via lifting, with whole-sample
  * symmetric boundary extension — the transform behind SPERR (and JPEG
  * 2000). Perfect reconstruction up to floating-point rounding; the
  * SPERR-like compressor's outlier-correction pass absorbs the residue.
  */
object Cdf97 {

  // Daubechies–Sweldens lifting coefficients for CDF 9/7.
  private val A1 = -1.586134342059924
  private val A2 = -0.052980118572961
  private val A3 = 0.882911075530934
  private val A4 = 0.443506852043971
  private val K  = 1.230174104914001

  /** One forward lifting pass on x(0 until n); afterwards even indices hold
    * approximation and odd indices detail coefficients (interleaved).
    */
  def forwardLine(x: Array[Double], n: Int): Unit = {
    if (n < 2) return
    @inline def mirror(i: Int): Int = if (i < 0) -i else if (i >= n) 2 * n - 2 - i else i
    var i = 1
    while (i < n) { x(i) += A1 * (x(i - 1) + x(mirror(i + 1))); i += 2 }
    i = 0
    while (i < n) { x(i) += A2 * (x(mirror(i - 1)) + x(mirror(i + 1))); i += 2 }
    i = 1
    while (i < n) { x(i) += A3 * (x(i - 1) + x(mirror(i + 1))); i += 2 }
    i = 0
    while (i < n) { x(i) += A4 * (x(mirror(i - 1)) + x(mirror(i + 1))); i += 2 }
    i = 0
    while (i < n) { x(i) *= K; i += 2 }       // approximation gain
    i = 1
    while (i < n) { x(i) /= K; i += 2 }       // detail gain
  }

  /** Inverse of [[forwardLine]]. */
  def inverseLine(x: Array[Double], n: Int): Unit = {
    if (n < 2) return
    @inline def mirror(i: Int): Int = if (i < 0) -i else if (i >= n) 2 * n - 2 - i else i
    var i = 0
    while (i < n) { x(i) /= K; i += 2 }
    i = 1
    while (i < n) { x(i) *= K; i += 2 }
    i = 0
    while (i < n) { x(i) -= A4 * (x(mirror(i - 1)) + x(mirror(i + 1))); i += 2 }
    i = 1
    while (i < n) { x(i) -= A3 * (x(i - 1) + x(mirror(i + 1))); i += 2 }
    i = 0
    while (i < n) { x(i) -= A2 * (x(mirror(i - 1)) + x(mirror(i + 1))); i += 2 }
    i = 1
    while (i < n) { x(i) -= A1 * (x(i - 1) + x(mirror(i + 1))); i += 2 }
  }

  /** Deinterleaves x(0 until n) so approximations occupy the front
    * ceil(n/2) slots and details the back floor(n/2).
    */
  def deinterleave(x: Array[Double], n: Int, tmp: Array[Double]): Unit = {
    val half = (n + 1) / 2
    var i = 0
    while (i < n) { tmp(if ((i & 1) == 0) i / 2 else half + i / 2) = x(i); i += 1 }
    System.arraycopy(tmp, 0, x, 0, n)
  }

  /** Inverse of [[deinterleave]]. */
  def interleave(x: Array[Double], n: Int, tmp: Array[Double]): Unit = {
    val half = (n + 1) / 2
    var i = 0
    while (i < n) { tmp(i) = x(if ((i & 1) == 0) i / 2 else half + i / 2); i += 1 }
    System.arraycopy(tmp, 0, x, 0, n)
  }

  /** Number of decomposition levels for the given dims: halve until the
    * smallest transformable extent drops below 8, max 4 (SPERR-like).
    */
  def levelsFor(dims: Array[Int]): Int = {
    var l = 0
    var cur = dims.map(d => d)
    while (l < 4 && cur.forall(_ >= 8)) { cur = cur.map(d => (d + 1) / 2); l += 1 }
    l
  }

  /** In-place multi-level forward transform of a grid: at each level, the
    * 1-D transform runs along every dimension of the current low-pass box.
    */
  def forward(grid: GridData, levels: Int): Unit = transformMulti(grid, levels, forward = true)

  /** Inverse of [[forward]]. */
  def inverse(grid: GridData, levels: Int): Unit = transformMulti(grid, levels, forward = false)

  private def transformMulti(grid: GridData, levels: Int, forward: Boolean): Unit = {
    val nd = grid.ndim
    val maxLen = grid.dims.max
    val line = new Array[Double](maxLen)
    val tmp = new Array[Double](maxLen)
    // extents of the low-pass box at each level
    val boxes = Iterator.iterate(grid.dims.map(identity))(_.map(d => (d + 1) / 2))
      .take(levels).toArray
    val order = if (forward) boxes.indices else boxes.indices.reverse
    for (li <- order) {
      val box = boxes(li)
      val dimOrder = if (forward) 0 until nd else (0 until nd).reverse
      for (dim <- dimOrder) {
        val n = box(dim)
        if (n >= 2) {
          // iterate all lines along `dim` within the box
          val lineCount = box.indices.filter(_ != dim).map(box(_)).product
          val others = box.indices.filter(_ != dim).toArray
          val c = new Array[Int](nd)
          var lc = 0
          while (lc < lineCount) {
            var rem = lc
            var oi = others.length - 1
            while (oi >= 0) { c(others(oi)) = rem % box(others(oi)); rem /= box(others(oi)); oi -= 1 }
            c(dim) = 0
            val base = grid.index(c)
            val st = grid.strides(dim)
            var i = 0
            while (i < n) { line(i) = grid.data(base + i * st); i += 1 }
            if (forward) { forwardLine(line, n); deinterleave(line, n, tmp) }
            else { interleave(line, n, tmp); inverseLine(line, n) }
            i = 0
            while (i < n) { grid.data(base + i * st) = line(i); i += 1 }
            lc += 1
          }
        }
      }
    }
  }
}

package repro.zfp

import repro.core._

/** ZFP-0.5.5-like fixed-accuracy block codec (Lindstrom 2014; the paper's
  * discrete-orthogonal-transform-based archetype, Section 3.2).
  *
  * Per 4^d block: common-exponent fixed-point conversion, an invertible
  * integer lifting transform along each dimension (a two-level Haar
  * S-transform — same archetype, exactly invertible in integers),
  * negabinary mapping, and zfp's embedded bit-plane group-testing coder.
  * Fixed-accuracy mode truncates bit planes below a cutoff derived from
  * the error tolerance and the block exponent, so the point-wise bound
  * holds without entropy coding — which is also why this codec is the
  * fastest and the lowest-ratio of the suite, as in the paper's Table 2/3.
  */
final class ZfpLike extends Compressor {
  import ZfpLike._

  override def name: String = "ZFP 0.5.5"

  override def compress(grid: GridData, absEb: Double): Array[Byte] = {
    require(absEb > 0, "absolute error bound must be positive")
    val nd = grid.ndim
    require(nd >= 1 && nd <= 3, s"ZfpLike supports 1-3 dimensions, got $nd")
    val head = new ByteWriter()
    head.writeVarInt(nd.toLong)
    grid.dims.foreach(d => head.writeVarInt(d.toLong))
    head.writeDouble(absEb)

    val bw = new BitWriter(grid.size / 2 + 64)
    val blockSize = 1 << (2 * nd) // 4^d
    val buf = new Array[Double](blockSize)
    val ints = new Array[Long](blockSize)
    val order = seqOrder(nd)
    val bDims = grid.dims.map(d => (d + 3) / 4)
    val nBlocks = bDims.product
    val bc = new Array[Int](nd)
    var b = 0
    while (b < nBlocks) {
      blockCoords(b, bDims, bc)
      gather(grid, bc, buf)
      encodeBlock(buf, ints, order, nd, absEb, bw)
      b += 1
    }
    head.writeBlob(bw.toBytes)
    head.toBytes
  }

  override def decompress(bytes: Array[Byte]): GridData = {
    val r = new ByteReader(bytes)
    val nd = r.readVarInt().toInt
    val dims = Array.fill(nd)(r.readVarInt().toInt)
    val absEb = r.readDouble()
    val br = new BitReader(r.readBlob())
    val grid = new GridData(dims, new Array[Double](dims.map(_.toLong).product.toInt))
    val blockSize = 1 << (2 * nd)
    val buf = new Array[Double](blockSize)
    val ints = new Array[Long](blockSize)
    val order = seqOrder(nd)
    val bDims = dims.map(d => (d + 3) / 4)
    val nBlocks = bDims.product
    val bc = new Array[Int](nd)
    var b = 0
    while (b < nBlocks) {
      blockCoords(b, bDims, bc)
      decodeBlock(buf, ints, order, nd, absEb, br)
      scatter(grid, bc, buf)
      b += 1
    }
    grid
  }

  private def blockCoords(b: Int, bDims: Array[Int], out: Array[Int]): Unit = {
    var rem = b
    var k = bDims.length - 1
    while (k >= 0) { out(k) = rem % bDims(k); rem /= bDims(k); k -= 1 }
  }

  /** Copies a 4^d block into `buf`, replicating edge values for partial
    * blocks (zfp's padding strategy).
    */
  private def gather(grid: GridData, bc: Array[Int], buf: Array[Double]): Unit = {
    val nd = grid.ndim
    val c = new Array[Int](nd)
    var i = 0
    val n = buf.length
    while (i < n) {
      var rem = i
      var k = nd - 1
      while (k >= 0) {
        val local = rem & 3
        rem >>= 2
        c(k) = math.min(bc(k) * 4 + local, grid.dims(k) - 1)
        k -= 1
      }
      buf(i) = grid.data(grid.index(c))
      i += 1
    }
  }

  private def scatter(grid: GridData, bc: Array[Int], buf: Array[Double]): Unit = {
    val nd = grid.ndim
    val c = new Array[Int](nd)
    var i = 0
    val n = buf.length
    while (i < n) {
      var rem = i
      var k = nd - 1
      var inBounds = true
      while (k >= 0) {
        val local = rem & 3
        rem >>= 2
        c(k) = bc(k) * 4 + local
        if (c(k) >= grid.dims(k)) inBounds = false
        k -= 1
      }
      if (inBounds) grid.data(grid.index(c)) = buf(i)
      i += 1
    }
  }
}

object ZfpLike {

  /** Fixed-point precision: values are scaled by 2^(Q − emax). */
  private val Q = 40
  /** Total bit planes considered (Q + transform growth headroom). */
  private val IntPrec = 48
  /** Negabinary mask. */
  private val NbMask = 0xaaaaaaaaaaaaaaaaL

  def apply(): ZfpLike = new ZfpLike

  /** Aggressive initial plane cutoff from the tolerance and block
    * exponent. The encoder verifies the bound per block by locally
    * simulating the truncation and lowers the cutoff when needed (the
    * per-block delta is stored in 6 bits), so the cutoff can start tight
    * instead of carrying a worst-case transform-gain margin.
    */
  private def kTry0(emax: Int, absEb: Double): Int = {
    val tolInt = absEb * math.pow(2.0, (Q - emax).toDouble)
    if (tolInt <= 1.0) 0
    else math.min(62, (math.log(tolInt) / math.log(2)).floor.toInt)
  }

  /** Sequency-style coefficient order for a 4^d block: DC first, then by
    * total frequency weight of the in-place Haar S-transform layout
    * (position weights 0,1,2,2 per dimension).
    */
  def seqOrder(nd: Int): Array[Int] = {
    val w = Array(0, 1, 2, 2)
    val n = 1 << (2 * nd)
    (0 until n).sortBy { i =>
      var rem = i; var total = 0; var k = 0
      while (k < nd) { total += w(rem & 3); rem >>= 2; k += 1 }
      (total, i)
    }.toArray
  }

  /** Forward two-level Haar S-transform on 4 elements at stride st:
    * pairs → (mean, diff), then the two means again. Exactly invertible.
    */
  def fwd4(a: Array[Long], o: Int, st: Int): Unit = {
    val v0 = a(o); val v1 = a(o + st); val v2 = a(o + 2 * st); val v3 = a(o + 3 * st)
    val d0 = v1 - v0; val s0 = v0 + (d0 >> 1)
    val d1 = v3 - v2; val s1 = v2 + (d1 >> 1)
    val dd = s1 - s0; val ss = s0 + (dd >> 1)
    a(o) = ss; a(o + st) = dd; a(o + 2 * st) = d0; a(o + 3 * st) = d1
  }

  /** Inverse of [[fwd4]]. */
  def inv4(a: Array[Long], o: Int, st: Int): Unit = {
    val ss = a(o); val dd = a(o + st); val d0 = a(o + 2 * st); val d1 = a(o + 3 * st)
    val s0 = ss - (dd >> 1); val s1 = dd + s0
    val v0 = s0 - (d0 >> 1); val v1 = d0 + v0
    val v2 = s1 - (d1 >> 1); val v3 = d1 + v2
    a(o) = v0; a(o + st) = v1; a(o + 2 * st) = v2; a(o + 3 * st) = v3
  }

  /** Applies [[fwd4]] (or [[inv4]]) along every line of each dimension of
    * the 4^d block.
    */
  private def transform(ints: Array[Long], nd: Int, forward: Boolean): Unit = {
    var dim = 0
    while (dim < nd) {
      val st = 1 << (2 * (nd - 1 - dim)) // stride of dim in block-local layout
      // iterate all lines along `dim`
      val nLines = ints.length / 4
      var li = 0
      while (li < nLines) {
        // decompose line index into the other dims' coordinates
        var o = 0
        var rem = li
        var k = nd - 1
        while (k >= 0) {
          if (k != dim) {
            val stK = 1 << (2 * (nd - 1 - k))
            o += (rem & 3) * stK
            rem >>= 2
          }
          k -= 1
        }
        if (forward) fwd4(ints, o, st) else inv4(ints, o, st)
        li += 1
      }
      dim += 1
    }
  }

  private[zfp] def encodeBlock(buf: Array[Double], ints: Array[Long], order: Array[Int],
                               nd: Int, absEb: Double, bw: BitWriter): Unit = {
    var maxAbs = 0.0
    var i = 0
    while (i < buf.length) { val a = math.abs(buf(i)); if (a > maxAbs) maxAbs = a; i += 1 }
    // Tiny blocks (incl. subnormals) are emitted as zero blocks: the
    // reconstruction error is < 1e-200, far below any practical bound.
    if (maxAbs < 1e-200) { bw.writeBit(0); return }
    bw.writeBit(1)
    val emax = math.getExponent(maxAbs) + 1
    bw.writeBits((emax + 1075).toLong, 12)
    val scale = math.pow(2.0, (Q - emax).toDouble)
    i = 0
    while (i < buf.length) { ints(i) = math.rint(buf(i) * scale).toLong; i += 1 }
    transform(ints, nd, forward = true)
    // negabinary + sequency reorder
    val u = new Array[Long](ints.length)
    i = 0
    while (i < u.length) { u(i) = (ints(order(i)) + NbMask) ^ NbMask; i += 1 }
    // Adaptive cutoff: start at the tolerance-derived plane and lower it
    // until the locally-simulated truncation satisfies the bound.
    val k0 = kTry0(emax, absEb)
    val invScale = math.pow(2.0, (emax - Q).toDouble)
    val scratch = new Array[Long](u.length)
    // coarse-then-refine search for the largest admissible cutoff
    var kmin = k0
    while (kmin > 0 && !truncationOk(buf, u, order, nd, kmin, invScale, absEb, scratch)) kmin = math.max(0, kmin - 3)
    while (kmin + 1 <= k0 && truncationOk(buf, u, order, nd, kmin + 1, invScale, absEb, scratch)) kmin += 1
    bw.writeBits((k0 - kmin).toLong, 6)
    var n = 0
    var k = IntPrec - 1
    val size = u.length
    while (k >= kmin) {
      // plane word: bit i = bit k of u(i)
      var x = 0L
      i = 0
      while (i < size) { x |= ((u(i) >>> k) & 1L) << i; i += 1 }
      n = encodePlane(x, n, size, bw)
      k -= 1
    }
  }

  /** Simulates the decoder's truncation at cutoff `kmin` and checks the
    * point-wise bound against the original block values.
    */
  private def truncationOk(buf: Array[Double], u: Array[Long], order: Array[Int], nd: Int,
                           kmin: Int, invScale: Double, absEb: Double,
                           scratch: Array[Long]): Boolean = {
    val mask = if (kmin == 0) -1L else ~((1L << kmin) - 1)
    var i = 0
    while (i < u.length) {
      val ut = u(i) & mask
      scratch(order(i)) = (ut ^ NbMask) - NbMask
      i += 1
    }
    transform(scratch, nd, forward = false)
    i = 0
    while (i < u.length) {
      if (math.abs(scratch(i) * invScale - buf(i)) > absEb) return false
      i += 1
    }
    true
  }

  private[zfp] def decodeBlock(buf: Array[Double], ints: Array[Long], order: Array[Int],
                               nd: Int, absEb: Double, br: BitReader): Unit = {
    if (br.readBit() == 0) { java.util.Arrays.fill(buf, 0.0); return }
    val emax = br.readBits(12).toInt - 1075
    val kmin = math.max(0, kTry0(emax, absEb) - br.readBits(6).toInt)
    val size = buf.length
    val u = new Array[Long](size)
    var n = 0
    var k = IntPrec - 1
    while (k >= kmin) {
      val (x, n2) = decodePlane(n, size, br)
      var i = 0
      while (i < size) { u(i) |= ((x >>> i) & 1L) << k; i += 1 }
      n = n2
      k -= 1
    }
    var i = 0
    while (i < size) { ints(order(i)) = (u(i) ^ NbMask) - NbMask; i += 1 }
    transform(ints, nd, forward = false)
    val invScale = math.pow(2.0, (emax - Q).toDouble)
    i = 0
    while (i < size) { buf(i) = ints(i) * invScale; i += 1 }
  }

  /** zfp's per-plane embedded coder: `n` refinement bits for the known
    * prefix, then unary group-tested significance for the remainder.
    * Returns the updated prefix length (persists across planes).
    */
  private[zfp] def encodePlane(plane: Long, nIn: Int, size: Int, bw: BitWriter): Int = {
    var x = plane
    var n = nIn
    // refinement bits (chunked: BitWriter caps writeBits at 57)
    var left = n
    while (left > 0) {
      val c = math.min(left, 48)
      bw.writeBits(x, c)
      x >>>= c
      left -= c
    }
    var outer = true
    while (outer && n < size) {
      val any = if (x != 0) 1 else 0
      bw.writeBit(any)
      if (any == 0) outer = false
      else {
        var inner = true
        while (inner && n < size - 1) {
          val bit = (x & 1L).toInt
          bw.writeBit(bit)
          if (bit == 1) inner = false
          else { x >>>= 1; n += 1 }
        }
        x >>>= 1; n += 1
      }
    }
    n
  }

  /** Mirror of [[encodePlane]]. Returns (plane word, updated prefix). */
  private[zfp] def decodePlane(nIn: Int, size: Int, br: BitReader): (Long, Int) = {
    var n = nIn
    var x = 0L
    var got = 0
    while (got < n) {
      val c = math.min(n - got, 48)
      x |= br.readBits(c) << got
      got += c
    }
    var outer = true
    while (outer && n < size) {
      if (br.readBit() == 1) {
        var inner = true
        while (inner && n < size - 1) {
          if (br.readBit() == 0) n += 1 else inner = false
        }
        x |= 1L << n
        n += 1
      } else outer = false
    }
    (x, n)
  }
}

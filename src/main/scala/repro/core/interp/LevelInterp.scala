package repro.core.interp

import repro.core._

/** Anchor-based level-wise interpolation predictor (Sections 5 and 6.3).
  *
  * One traversal engine serves compression, decompression and tuning
  * trials: the traversal order is fully determined by the [[InterpPlan]],
  * so the decompressor replays the exact prediction sequence of the
  * compressor. During compression each predicted point is immediately
  * replaced by its reconstruction, guaranteeing both sides predict from
  * identical data.
  *
  * Features implemented here:
  *  - hierarchical levels from stride anchorStride/2 down to 1;
  *  - lossless anchors on the anchorStride lattice (stride 1 along a
  *    frozen dimension — Section 6.3);
  *  - 1D-style passes with a configurable dimension order, or the
  *    symmetric multi-dimensional paradigm (Section 5.3, Eq. 9);
  *  - linear / not-a-knot cubic / natural cubic splines (Section 5.2);
  *  - the same-level cubic two-step split (Section 5.4.2), honoured in
  *    1D-style cubic passes;
  *  - fast-varying-first traversal toggle (Section 5.4.1);
  *  - per-level error bounds (Eq. 15);
  *  - per-block spline override from block-wise tuning (Section 6.6).
  */
object LevelInterp {

  /** Quantizer code radius shared by all interpolation compressors. */
  val Radius: Int = 32768

  /** Receives every predicted point in traversal order. */
  trait Sink {
    /** Called before each level's passes begin. */
    def startLevel(level: Int, eb: Double): Unit
    /** Handles point `idx` with prediction `pred`; returns the
      * reconstructed value to write back into the working array.
      */
    def handle(idx: Int, pred: Double): Double
  }

  /** Output of a compression traversal. */
  final case class InterpResult(codes: Array[Int], outliers: Array[Double], anchors: Array[Double])

  /** Aggregate statistics from a tuning trial (Section 6.2).
    *
    * @param sumSqRecon   Σ (reconstruction − original)² — drives the tuner's
    *                     PSNR estimate
    * @param perLevelAbs  Σ |prediction error| per level (index l−1)
    * @param perLevelCnt  predicted-point count per level
    */
  final case class TrialStats(nPredicted: Long, sumAbsErr: Double, sumSqErr: Double,
                              sumSqRecon: Double, estPayloadBits: Double, nAnchors: Long,
                              perLevelAbs: Array[Double], perLevelCnt: Array[Long]) {
    def meanAbsErr: Double = if (nPredicted == 0) 0 else sumAbsErr / nPredicted
    def mse: Double = if (nPredicted == 0) 0 else sumSqErr / nPredicted
    def reconMse: Double = if (nPredicted == 0) 0 else sumSqRecon / nPredicted
    /** Estimated total bits incl. fp32 anchors. */
    def totalBits: Double = estPayloadBits + 32.0 * nAnchors
    def meanAbsAtLevel(l: Int): Double = {
      val c = perLevelCnt(l - 1)
      if (c == 0) Double.PositiveInfinity else perLevelAbs(l - 1) / c
    }
  }

  // ---------------------------------------------------------------------
  // Anchors

  /** Iterates anchor flat-indices in deterministic (row-major) order. */
  def forEachAnchor(dims: Array[Int], strides: Array[Int], anchorStride: Int,
                    frozenDim: Int)(f: Int => Unit): Unit = {
    val nd = dims.length
    val starts = new Array[Int](nd)
    val steps = Array.tabulate(nd)(k => if (k == frozenDim) 1 else anchorStride)
    odometer(dims, strides, starts, steps, Array.range(0, nd), null)((idx, _) => f(idx))
  }

  def countAnchors(dims: Array[Int], anchorStride: Int, frozenDim: Int): Long = {
    var n = 1L
    var k = 0
    while (k < dims.length) {
      n *= (if (k == frozenDim) dims(k).toLong else ((dims(k) - 1) / anchorStride + 1).toLong)
      k += 1
    }
    n
  }

  // ---------------------------------------------------------------------
  // Public entry points

  /** Runs the prediction traversal over `work` (which is mutated into the
    * reconstruction) and collects quantization codes / outliers / anchors.
    */
  def compressWith(work: GridData, plan: InterpPlan): InterpResult = {
    val anchors = new Array[Double](countAnchors(work.dims, plan.anchorStride, plan.frozenDim).toInt)
    var ai = 0
    forEachAnchor(work.dims, work.strides, plan.anchorStride, plan.frozenDim) { idx =>
      val v = work.data(idx).toFloat.toDouble // fp32 lossless storage (inputs are fp32-exact)
      anchors(ai) = v; work.data(idx) = v; ai += 1
    }
    val sink = new CompressSink(work.data)
    traverse(work, plan, sink)
    InterpResult(sink.quant.codesArray0, sink.quant.outliersArray0, anchors)
  }

  /** Rebuilds the grid from codes/outliers/anchors by replaying the
    * compressor's traversal.
    */
  def decompressWith(plan: InterpPlan, codes: Array[Int], outliers: Array[Double],
                     anchors: Array[Double]): GridData = {
    val grid = new GridData(plan.dims.clone(), new Array[Double](plan.dims.map(_.toLong).product.toInt))
    var ai = 0
    forEachAnchor(grid.dims, grid.strides, plan.anchorStride, plan.frozenDim) { idx =>
      grid.data(idx) = anchors(ai); ai += 1
    }
    val sink = new DecompressSink(codes, outliers)
    traverse(grid, plan, sink)
    grid
  }

  /** Tuning trial: runs the traversal on a COPY of `grid`, quantizing with
    * the plan's error bounds, and returns error/size statistics. The
    * entropy estimate stands in for Huffman+Zstd size (QoZ's approach).
    */
  def trial(grid: GridData, plan: InterpPlan, encode: Boolean = true): TrialStats = {
    val work = grid.copyGrid
    val nAnchors = countAnchors(work.dims, plan.anchorStride, plan.frozenDim)
    forEachAnchor(work.dims, work.strides, plan.anchorStride, plan.frozenDim) { idx =>
      work.data(idx) = work.data(idx).toFloat.toDouble
    }
    val sink = new TrialSink(work.data, plan.maxLevel)
    traverse(work, plan, sink)
    val codes = sink.quant.codesArray0
    // Estimate the payload with the REAL entropy stage (Huffman + Zstd):
    // Shannon entropy misranks configurations because it ignores both the
    // Huffman table and Zstd's gains on concentrated streams. Callers that
    // only need prediction-error statistics pass encode = false.
    val encodedBits =
      if (codes.isEmpty) 0.0
      else if (encode) Lossless.compress(Huffman.encode(codes)).length * 8.0
      else Huffman.entropyBits(codes) * codes.length
    TrialStats(sink.count, sink.sumAbs, sink.sumSq, sink.sumSqRecon,
      encodedBits + 36.0 * sink.quant.outliersArray0.length, nAnchors,
      sink.levelAbs, sink.levelCnt)
  }

  // ---------------------------------------------------------------------
  // Sinks

  /** Growable int buffer without boxing. */
  private[interp] final class IntBuf(initial: Int = 1 << 12) {
    private var a = new Array[Int](initial)
    private var n = 0
    def +=(v: Int): Unit = {
      if (n == a.length) a = java.util.Arrays.copyOf(a, a.length * 2)
      a(n) = v; n += 1
    }
    def toArray: Array[Int] = java.util.Arrays.copyOf(a, n)
  }

  private[interp] final class DblBuf(initial: Int = 256) {
    private var a = new Array[Double](initial)
    private var n = 0
    def +=(v: Double): Unit = {
      if (n == a.length) a = java.util.Arrays.copyOf(a, a.length * 2)
      a(n) = v; n += 1
    }
    def toArray: Array[Double] = java.util.Arrays.copyOf(a, n)
  }

  /** Inline quantizer shared by compress/trial sinks (code 0 = outlier). */
  private[interp] final class StreamQuantizer {
    private val codes = new IntBuf()
    private val outs = new DblBuf()
    private var eb = 1.0
    private var twoEb = 2.0
    def setEb(e: Double): Unit = { eb = e; twoEb = 2 * e }
    def quantize(value: Double, pred: Double): Double = {
      val q = math.rint((value - pred) / twoEb)
      if (math.abs(q) < Radius - 1) {
        val recon = pred + q * twoEb
        if (math.abs(recon - value) <= eb) { codes += (q.toInt + Radius); return recon }
      }
      codes += 0
      val v = value.toFloat.toDouble
      outs += v
      v
    }
    def codesArray0: Array[Int] = codes.toArray
    def outliersArray0: Array[Double] = outs.toArray
  }

  private final class CompressSink(data: Array[Double]) extends Sink {
    val quant = new StreamQuantizer
    def startLevel(level: Int, eb: Double): Unit = quant.setEb(eb)
    def handle(idx: Int, pred: Double): Double = quant.quantize(data(idx), pred)
  }

  private final class DecompressSink(codes: Array[Int], outliers: Array[Double]) extends Sink {
    private var ci = 0
    private var oi = 0
    private var twoEb = 2.0
    def startLevel(level: Int, eb: Double): Unit = twoEb = 2 * eb
    def handle(idx: Int, pred: Double): Double = {
      val code = codes(ci); ci += 1
      if (code == 0) { val v = outliers(oi); oi += 1; v }
      else pred + (code - Radius).toDouble * twoEb
    }
  }

  private final class TrialSink(data: Array[Double], maxLevel: Int) extends Sink {
    val quant = new StreamQuantizer
    var count = 0L
    var sumAbs = 0.0
    var sumSq = 0.0
    var sumSqRecon = 0.0
    val levelAbs = new Array[Double](maxLevel)
    val levelCnt = new Array[Long](maxLevel)
    private var curLevel = 1
    def startLevel(level: Int, eb: Double): Unit = { curLevel = level; quant.setEb(eb) }
    def handle(idx: Int, pred: Double): Double = {
      val v = data(idx)
      val err = v - pred
      count += 1; sumAbs += math.abs(err); sumSq += err * err
      levelAbs(curLevel - 1) += math.abs(err)
      levelCnt(curLevel - 1) += 1
      val recon = quant.quantize(v, pred)
      val re = recon - v
      sumSqRecon += re * re
      recon
    }
  }

  // ---------------------------------------------------------------------
  // Traversal

  /** Drives all levels and passes, writing each point's reconstruction
    * (returned by the sink) back into `grid.data`.
    */
  def traverse(grid: GridData, plan: InterpPlan, sink: Sink): Unit = {
    val dims = grid.dims
    val nd = dims.length
    val active = plan.activeDims
    var level = plan.maxLevel
    while (level >= 1) {
      val s = 1 << (level - 1)
      val cfg = plan.levelConfigs(level - 1)
      sink.startLevel(level, plan.levelEbs(level - 1))
      cfg.paradigm match {
        case Paradigm.OneD(order) =>
          val useSameLevel = cfg.sameLevel && cfg.spline.isCubic
          var j = 0
          while (j < order.length) {
            val dim = order(j)
            if (s < dims(dim)) { // pass has points only if stride fits
              val starts = new Array[Int](nd)
              val steps = new Array[Int](nd)
              var k = 0
              while (k < nd) {
                if (k == plan.frozenDim) { starts(k) = 0; steps(k) = 1 }
                else if (k == dim) { starts(k) = s; steps(k) = 2 * s }
                else {
                  val pos = order.indexOf(k)
                  if (pos >= 0 && pos < j) { starts(k) = 0; steps(k) = s }      // earlier dim: done at stride s
                  else { starts(k) = 0; steps(k) = 2 * s }                       // later dim: still at 2s
                }
                k += 1
              }
              val loopOrder = buildLoopOrder(nd, dim, plan.fvfi)
              if (useSameLevel) {
                // Step 1: positions ≡ s (mod 4s) — inter-level 4-point stencil.
                starts(dim) = s; steps(dim) = 4 * s
                run1DPass(grid, plan, dim, s, starts, steps, loopOrder, cfg.spline, sameLevelStep = false, sink)
                // Step 2: positions ≡ 3s (mod 4s) — same-level 6-point stencil.
                if (3 * s < dims(dim)) {
                  starts(dim) = 3 * s; steps(dim) = 4 * s
                  run1DPass(grid, plan, dim, s, starts, steps, loopOrder, cfg.spline, sameLevelStep = true, sink)
                }
              } else {
                run1DPass(grid, plan, dim, s, starts, steps, loopOrder, cfg.spline, sameLevelStep = false, sink)
              }
            }
            j += 1
          }
        case Paradigm.MultiDim =>
          runMultiDim(grid, plan, s, cfg.spline, sink)
      }
      level -= 1
    }
  }

  /** Loop nesting order, outermost first. FVFI puts the fastest-varying
    * (last) dimension innermost; the QoZ order puts the interpolation
    * dimension innermost (Fig. 5).
    */
  private def buildLoopOrder(nd: Int, interpDim: Int, fvfi: Boolean): Array[Int] =
    if (fvfi) Array.range(0, nd)
    else Array.range(0, nd).filterNot(_ == interpDim) :+ interpDim

  /** Generic odometer over a start/step lattice. Calls f(flatIdx, coords);
    * `coords` is shared and must not be retained.
    */
  private def odometer(dims: Array[Int], strides: Array[Int],
                       starts: Array[Int], steps: Array[Int], loopOrder: Array[Int],
                       coordsOut: Array[Int])(f: (Int, Array[Int]) => Unit): Unit = {
    val nd = dims.length
    var k = 0
    var idx = 0
    val coords = if (coordsOut != null) coordsOut else new Array[Int](nd)
    while (k < nd) {
      if (starts(k) >= dims(k)) return // empty lattice
      coords(k) = starts(k)
      idx += starts(k) * strides(k)
      k += 1
    }
    var done = false
    while (!done) {
      f(idx, coords)
      var li = nd - 1
      var carried = true
      while (carried) {
        val d = loopOrder(li)
        coords(d) += steps(d)
        idx += steps(d) * strides(d)
        if (coords(d) < dims(d)) carried = false
        else {
          idx -= (coords(d) - starts(d)) * strides(d)
          coords(d) = starts(d)
          li -= 1
          if (li < 0) { carried = false; done = true }
        }
      }
    }
  }

  /** One 1D-style interpolation pass along `dim` at stride `s`. */
  private def run1DPass(grid: GridData, plan: InterpPlan, dim: Int, s: Int,
                        starts: Array[Int], steps: Array[Int], loopOrder: Array[Int],
                        spline: Spline.Kind, sameLevelStep: Boolean, sink: Sink): Unit = {
    val data = grid.data
    val n = grid.dims(dim)
    val st = grid.strides(dim)
    val block = new BlockLookup(plan, grid.dims)
    odometer(grid.dims, grid.strides, starts, steps, loopOrder, null) { (idx, coords) =>
      val kind = block.splineAt(coords, spline)
      val pred = predictAlong(data, idx, coords(dim), n, st, s, kind, sameLevelStep)
      data(idx) = sink.handle(idx, pred)
    }
  }

  /** Multi-dimensional passes: points with 1 odd coordinate first, then 2,
    * then 3, … (Section 5.3). Prediction is the 1/σ²-weighted combination
    * of the available 1-D interpolants (Eq. 9 with Eq. 12 weights).
    */
  private def runMultiDim(grid: GridData, plan: InterpPlan, s: Int,
                          spline: Spline.Kind, sink: Sink): Unit = {
    val dims = grid.dims
    val strides = grid.strides
    val nd = dims.length
    val data = grid.data
    val active = plan.activeDims
    val block = new BlockLookup(plan, dims)
    val starts = new Array[Int](nd)
    val steps = Array.tabulate(nd)(k => if (k == plan.frozenDim) 1 else s)
    val loopOrder = Array.range(0, nd)
    var targetOdd = 1
    while (targetOdd <= active.length) {
      odometer(dims, strides, starts, steps, loopOrder, null) { (idx, coords) =>
        var oddCount = 0
        var a = 0
        while (a < active.length) {
          if (((coords(active(a)) / s) & 1) == 1) oddCount += 1
          a += 1
        }
        if (oddCount == targetOdd) {
          val kind = block.splineAt(coords, spline)
          var wsum = 0.0
          var psum = 0.0
          a = 0
          while (a < active.length) {
            val k = active(a)
            if (((coords(k) / s) & 1) == 1) {
              val w = plan.dimWeights(k)
              psum += w * predictAlong(data, idx, coords(k), dims(k), strides(k), s, kind, sameLevelStep = false)
              wsum += w
            }
            a += 1
          }
          val pred = if (wsum > 0) psum / wsum else data(idx)
          data(idx) = sink.handle(idx, pred)
        }
      }
      targetOdd += 1
    }
  }

  /** Resolves the effective spline kind for a point, honouring the
    * block-wise override (Section 6.6).
    */
  private final class BlockLookup(plan: InterpPlan, dims: Array[Int]) {
    private val enabled = plan.blockSize > 0 && plan.blockSplines.nonEmpty
    private val bs = math.max(1, plan.blockSize)
    private val bDims = dims.map(d => (d + bs - 1) / bs)
    private val bStrides = {
      val a = new Array[Int](dims.length)
      if (dims.nonEmpty) {
        a(dims.length - 1) = 1
        var i = dims.length - 2
        while (i >= 0) { a(i) = a(i + 1) * bDims(i + 1); i -= 1 }
      }
      a
    }
    def splineAt(coords: Array[Int], default: Spline.Kind): Spline.Kind =
      if (!enabled) default
      else {
        var bid = 0
        var k = 0
        while (k < coords.length) { bid += (coords(k) / bs) * bStrides(k); k += 1 }
        Spline.Kind.all(plan.blockSplines(bid))
      }
  }

  /** 1-D spline prediction for position p (stride s) along one dimension,
    * with boundary fallbacks: full stencil → linear → extrapolate → copy.
    */
  private def predictAlong(data: Array[Double], idx: Int, p: Int, n: Int, st: Int,
                           s: Int, kind: Spline.Kind, sameLevelStep: Boolean): Double = {
    val off = s * st
    val hasP1 = p + s < n
    if (!hasP1) {
      if (p - 3 * s >= 0) Spline.extrapolate(data(idx - 3 * off), data(idx - off))
      else data(idx - off)
    } else if (!kind.isCubic) {
      Spline.linear(data(idx - off), data(idx + off))
    } else if (sameLevelStep) {
      // p ≡ 3s (mod 4s): left neighbors at −s, −2s, −3s always exist.
      val hasP3 = p + 3 * s < n
      val hasP2 = p + 2 * s < n
      if (kind == Spline.Kind.Natural && hasP3)
        Spline.sameLevelNatural(data(idx - 3 * off), data(idx - 2 * off), data(idx - off),
          data(idx + off), data(idx + 2 * off), data(idx + 3 * off))
      else if (hasP2)
        Spline.sameLevelNotAKnot(data(idx - 2 * off), data(idx - off),
          data(idx + off), data(idx + 2 * off))
      else
        Spline.linear(data(idx - off), data(idx + off))
    } else {
      val hasM3 = p - 3 * s >= 0
      val hasP3 = p + 3 * s < n
      if (hasM3 && hasP3) {
        if (kind == Spline.Kind.Natural)
          Spline.natural(data(idx - 3 * off), data(idx - off), data(idx + off), data(idx + 3 * off))
        else
          Spline.notAKnot(data(idx - 3 * off), data(idx - off), data(idx + off), data(idx + 3 * off))
      } else {
        Spline.linear(data(idx - off), data(idx + off))
      }
    }
  }
}

package repro.data

import repro.core.GridData

/** Synthetic analogues of the paper's eight evaluation datasets (Table 1).
  *
  * The real datasets (SDRBench archives, multi-GB) are unavailable in this
  * sealed environment; these generators preserve the *character* that
  * drives each compressor-design decision — smooth wavefields (RTM),
  * piecewise-smooth geology (SEGSalt), multi-scale turbulence (Miranda,
  * JHTDB), and the vertically-rough climate/weather stacks (SCALE-LetKF,
  * CESM-ATM) that motivate dynamic dimension freezing — at ~10⁻³ of the
  * paper's scale. See DESIGN.md §3 for the substitution table.
  *
  * Every value is deterministic in (dataset, field, coordinates) and
  * exactly representable as float32, so generation can run inside Spark
  * partitions and the driver alike, and compressors may store lossless
  * side data in 4 bytes.
  */
object SciData {

  /** A single named field (≙ one file of a paper dataset). */
  final case class FieldRef(dataset: String, field: String, dims: Array[Int], isInteger: Boolean) {
    def points: Long = dims.map(_.toLong).product
    /** fp32 accounting, as in the paper (all float datasets are fp32). */
    def rawBytes: Long = points * 4
    override def toString = s"$dataset/$field(${dims.mkString("x")})"
  }

  /** The six floating-point datasets, in the paper's Table 2 row order. */
  val floatDatasets: Seq[String] = Seq("CESM", "RTM", "Miranda", "SCALE", "JHTDB", "SegSalt")

  /** The two integer datasets. */
  val intDatasets: Seq[String] = Seq("NSTX-GPI", "APS")

  /** Benchmark-scale dims per dataset (paper dims → scaled, DESIGN.md §3). */
  private val benchDims: Map[String, Array[Int]] = Map(
    "RTM"      -> Array(112, 112, 60),  // paper 449×449×235
    "SegSalt"  -> Array(126, 126, 44),  // paper 1008×1008×352
    "Miranda"  -> Array(64, 96, 96),    // paper 256×384×384
    "SCALE"    -> Array(49, 150, 150),  // paper 98×1200×1200
    "CESM"     -> Array(26, 180, 360),  // paper 26×1800×3600 (26 levels kept!)
    "JHTDB"    -> Array(96, 96, 96),    // paper 512×512×512
    "NSTX-GPI" -> Array(500, 40, 32),   // paper 50000×80×64 (integer movie)
    "APS"      -> Array(448, 512),      // paper 1792×2048 (integer image)
  )

  /** Fields per dataset (≙ the paper's multiple files per application). */
  def fields(dataset: String, shrink: Double = 1.0): Seq[FieldRef] = {
    val dims0 = benchDims.getOrElse(dataset,
      throw new IllegalArgumentException(s"unknown dataset $dataset"))
    val dims = dims0.map(d => math.max(8, math.round(d * shrink).toInt))
    val isInt = intDatasets.contains(dataset)
    val names = dataset match {
      case "CESM"  => Seq("CLDHGH", "TS")
      case "RTM"   => Seq("snapshot-1400", "snapshot-2000")
      case "Miranda" => Seq("density", "velocityx")
      case "SCALE" => Seq("QS", "U")
      case "JHTDB" => Seq("pressure-1", "pressure-2")
      case "SegSalt" => Seq("velocity", "overthrust")
      case "NSTX-GPI" => Seq("frames")
      case "APS"   => Seq("detector")
    }
    names.map(n => FieldRef(dataset, n, dims, isInt))
  }

  /** All fields of all float datasets at a given shrink factor. */
  def allFloatFields(shrink: Double = 1.0): Seq[FieldRef] =
    floatDatasets.flatMap(fields(_, shrink))

  // ---------------------------------------------------------------------
  // Deterministic pseudo-randomness (splitmix64 over seeds)

  private def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform in [0,1) from a compound seed. */
  private def u(seed: Long, k: Int): Double =
    ((mix(seed * 1315423911L + k) >>> 11).toDouble / (1L << 53).toDouble)

  private def fieldSeed(ref: FieldRef): Long =
    mix(ref.dataset.hashCode.toLong << 32 | (ref.field.hashCode & 0xffffffffL))

  // ---------------------------------------------------------------------
  // Value functions

  /** Value at integer coordinates (deterministic, fp32-exact). */
  def valueAt(ref: FieldRef, c: Array[Int]): Double = {
    val s = fieldSeed(ref)
    val dims = ref.dims
    val v = ref.dataset match {
      case "RTM"      => rtm(s, c, dims)
      case "SegSalt"  => segsalt(s, c, dims)
      case "Miranda"  => miranda(s, c, dims)
      case "SCALE"    => levelStack(s, c, dims, levelPhaseJump = 0.35, levelAmpRough = 0.6)
      case "CESM"     => levelStack(s, c, dims, levelPhaseJump = 2.1, levelAmpRough = 1.0)
      case "JHTDB"    => jhtdb(s, c, dims)
      case "NSTX-GPI" => nstx(s, c, dims)
      case "APS"      => aps(s, c, dims)
    }
    if (ref.isInteger) math.rint(v) else v.toFloat.toDouble
  }

  /** Materializes the whole field (driver-side; bench scale is ~1M pts). */
  def generate(ref: FieldRef): GridData = GridData.tabulate(ref.dims)(c => valueAt(ref, c))

  /** RTM: a few Gaussian-enveloped spherical wavefronts over a smooth
    * background — very smooth, very high CR (paper Table 3).
    */
  private def rtm(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val x = c(0).toDouble / dims(0); val y = c(1).toDouble / dims(1); val z = c(2).toDouble / dims(2)
    var v = 0.0
    var w = 0
    while (w < 4) {
      val cx = u(s, 10 * w); val cy = u(s, 10 * w + 1); val cz = u(s, 10 * w + 2)
      val r = math.sqrt((x - cx) * (x - cx) + (y - cy) * (y - cy) + (z - cz) * (z - cz))
      val k = 14.0 + 8.0 * u(s, 10 * w + 3)
      val sig = 0.15 + 0.1 * u(s, 10 * w + 4)
      v += math.sin(k * r + 6.28 * u(s, 10 * w + 5)) * math.exp(-r * r / (sig * sig)) / (w + 1.0)
      w += 1
    }
    // fine-scale numerical ripple (power-law tail down to the grid scale)
    v += fineTail(s, x, y, z, 3e-3)
    v * 1e3 // seismic-amplitude scale
  }

  /** Low-amplitude fine-scale tail: smooth value noise on a hashed
    * lattice (cell size ~4 normalized units of 1/32). Unlike global
    * sinusoids, this is spatially incoherent — full Tucker rank, not
    * representable by a few global basis vectors — which is how fine-scale
    * structure behaves in real simulation output. It keeps stride-1
    * prediction partially possible (the noise is smooth inside a cell),
    * so predictor quality differentiates compressors at fine levels.
    */
  private def fineTail(s: Long, x: Double, y: Double, z: Double, a0: Double): Double =
    a0 * (valueNoise(s, 24.0 * x, 24.0 * y, 24.0 * z) +
      0.5 * valueNoise(s + 31, 48.0 * x, 48.0 * y, 48.0 * z))

  /** Trilinear-interpolated hash noise in [-1, 1] with smoothstep fade. */
  private def valueNoise(s: Long, px: Double, py: Double, pz: Double): Double = {
    val x0 = math.floor(px).toInt; val y0 = math.floor(py).toInt; val z0 = math.floor(pz).toInt
    val fx = px - x0; val fy = py - y0; val fz = pz - z0
    @inline def fade(t: Double) = t * t * (3 - 2 * t)
    val wx = fade(fx); val wy = fade(fy); val wz = fade(fz)
    @inline def h(i: Int, j: Int, k: Int): Double = {
      val m = mix(s ^ (i.toLong * 0x9E3779B1L) ^ (j.toLong * 0x85EBCA77L) ^ (k.toLong * 0xC2B2AE3DL))
      (m >>> 11).toDouble / (1L << 52).toDouble - 1.0
    }
    val c00 = h(x0, y0, z0) + wx * (h(x0 + 1, y0, z0) - h(x0, y0, z0))
    val c01 = h(x0, y0, z0 + 1) + wx * (h(x0 + 1, y0, z0 + 1) - h(x0, y0, z0 + 1))
    val c10 = h(x0, y0 + 1, z0) + wx * (h(x0 + 1, y0 + 1, z0) - h(x0, y0 + 1, z0))
    val c11 = h(x0, y0 + 1, z0 + 1) + wx * (h(x0 + 1, y0 + 1, z0 + 1) - h(x0, y0 + 1, z0 + 1))
    val c0 = c00 + wy * (c10 - c00)
    val c1 = c01 + wy * (c11 - c01)
    c0 + wz * (c1 - c0)
  }

  /** SEGSalt: depth-layered velocity model with undulating interfaces and
    * a high-velocity salt body — piecewise smooth.
    */
  private def segsalt(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val x = c(0).toDouble / dims(0); val y = c(1).toDouble / dims(1); val z = c(2).toDouble / dims(2)
    val undulation = 0.06 * math.sin(4.1 * x + 6.28 * u(s, 1)) + 0.05 * math.cos(3.3 * y + 6.28 * u(s, 2))
    // soft staircase: t − sin(2πt)/2π has flat treads with steep but
    // finite-gradient risers (real velocity models are band-limited)
    val t = (z + undulation) * 8.0
    val layer = t - math.sin(6.283185307179586 * t) / 6.283185307179586
    var v = 1500.0 + 260.0 * layer + 120.0 * z
    // salt body: smooth-edged ellipsoid of near-constant high velocity
    val dx = (x - 0.45) / 0.28; val dy = (y - 0.55) / 0.3; val dz = (z - 0.5) / 0.22
    val q = dx * dx + dy * dy + dz * dz
    val salt = 1.0 / (1.0 + math.exp((q - 1.0) * 25.0))
    v = v * (1 - salt) + (4450.0 + 30.0 * z) * salt
    v + 1e3 * fineTail(s, x, y, z, 2e-3)
  }

  /** Miranda: smooth multi-mode mixing field with a soft interface.
    * Gaussian mode envelopes break the separable-sum structure (real
    * turbulence is not low-Tucker-rank).
    */
  private def miranda(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val x = c(0).toDouble / dims(0); val y = c(1).toDouble / dims(1); val z = c(2).toDouble / dims(2)
    var v = 0.0
    var m = 0
    while (m < 8) {
      val kx = 0.8 + 1.8 * u(s, 9 * m); val ky = 0.8 + 1.8 * u(s, 9 * m + 1)
      val kz = 0.8 + 1.8 * u(s, 9 * m + 2)
      val cx = u(s, 9 * m + 4); val cy = u(s, 9 * m + 5); val cz = u(s, 9 * m + 6)
      val d2 = (x - cx) * (x - cx) + (y - cy) * (y - cy) + (z - cz) * (z - cz)
      val env = math.exp(-d2 / 0.35)
      v += env * math.sin(6.28 * (kx * x + ky * y + kz * z) + 6.28 * u(s, 9 * m + 3)) / (m + 1.5)
      m += 1
    }
    // density interface (tanh front) + fine-scale mixing tail
    1.8 + 0.9 * math.tanh(6.0 * (y - 0.5 + 0.15 * v)) + 0.12 * v + fineTail(s, x, y, z, 2.5e-3)
  }

  /** Vertically-stacked atmosphere: per-level 2-D fields whose mode phases
    * drift by `levelPhaseJump` per level (small = SCALE-LetKF's partially
    * correlated levels; large = CESM-ATM's nearly independent levels) and
    * whose per-level amplitude is roughened by `levelAmpRough`. The
    * non-smooth dim 0 is what dynamic dimension freezing targets (§6.3).
    */
  private def levelStack(s: Long, c: Array[Int], dims: Array[Int],
                         levelPhaseJump: Double, levelAmpRough: Double): Double = {
    val lev = c(0)
    val y = c(1).toDouble / dims(1); val z = c(2).toDouble / dims(2)
    val levAmp = 1.0 + levelAmpRough * (u(mix(s + 77), lev) - 0.5)
    var v = 0.0
    var m = 0
    while (m < 6) {
      val ky = 0.8 + 2.4 * u(s, 8 * m); val kz = 0.8 + 2.4 * u(s, 8 * m + 1)
      // envelope centers drift randomly per level so the stack is NOT a
      // low-Tucker-rank sum of separable terms (real atmospheres aren't)
      val cy = (u(s, 8 * m + 4) + 0.2 * u(mix(s + 1013L * lev), m)) % 1.0
      val cz = (u(s, 8 * m + 5) + 0.2 * u(mix(s + 2027L * lev), m + 40)) % 1.0
      val d2 = (y - cy) * (y - cy) + (z - cz) * (z - cz)
      val env = math.exp(-d2 / 0.3)
      val phase = 6.28 * u(s, 8 * m + 2) + levelPhaseJump * lev * (1 + 0.3 * m)
      v += env * math.sin(6.28 * (ky * y + kz * z) + phase) / (m + 1.2)
      m += 1
    }
    // per-level INDEPENDENT fine noise: each atmospheric level carries its
    // own small-scale structure, so no horizontal basis is shared across
    // levels (this is what defeats global-basis compressors on real CESM)
    levAmp * v + 0.02 * lev + fineTail(mix(s + 7919L * (lev + 3)), 0.37, y, z, 3e-3)
  }

  /** JHTDB: broadband multi-octave turbulence — steep power-law spectrum
    * (pressure fields are smooth at the grid scale), with envelopes on
    * the high octaves to break separability.
    */
  private def jhtdb(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val x = c(0).toDouble / dims(0); val y = c(1).toDouble / dims(1); val z = c(2).toDouble / dims(2)
    var v = 0.0
    var o = 0
    while (o < 4) {
      val amp = math.pow(2.0, -2.0 * o)
      var m = 0
      while (m < 3) {
        val base = 20 * o + 6 * m
        val k = (1 << o).toDouble
        val kx = k * (0.4 + 0.7 * u(s, base)); val ky = k * (0.4 + 0.7 * u(s, base + 1))
        val kz = k * (0.4 + 0.7 * u(s, base + 2))
        val env =
          if (o < 2) 1.0
          else {
            val cx = u(s, base + 4); val cy = u(s, base + 5)
            math.exp(-((x - cx) * (x - cx) + (y - cy) * (y - cy)) / 0.25)
          }
        v += amp * env * math.sin(6.28 * (kx * x + ky * y + kz * z) + 6.28 * u(s, base + 3))
        m += 1
      }
      o += 1
    }
    v + fineTail(s, x, y, z, 4e-3)
  }

  /** NSTX-GPI: integer plasma-blob movie — bright blobs drifting across a
    * small frame over many time steps (dim 0 = time).
    */
  private def nstx(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val t = c(0).toDouble / dims(0)
    val y = c(1).toDouble; val z = c(2).toDouble
    var v = 420.0 + 40.0 * math.sin(12.0 * t)
    var b = 0
    while (b < 3) {
      val yc = dims(1) * (0.2 + 0.6 * ((u(s, 7 * b) + 0.7 * t * (1 + b)) % 1.0))
      val zc = dims(2) * (0.2 + 0.6 * ((u(s, 7 * b + 1) + 0.9 * t * (2 - 0.5 * b)) % 1.0))
      val d2 = (y - yc) * (y - yc) + (z - zc) * (z - zc)
      v += 1600.0 / (1 + b) * math.exp(-d2 / (30.0 + 20 * b))
      b += 1
    }
    v
  }

  /** APS: integer 2-D detector image — smooth background, diffraction
    * rings and bright spots.
    */
  private def aps(s: Long, c: Array[Int], dims: Array[Int]): Double = {
    val x = c(0).toDouble / dims(0); val y = c(1).toDouble / dims(1)
    val dx = x - 0.5; val dy = y - 0.5
    val r = math.sqrt(dx * dx + dy * dy)
    var v = 900.0 * math.exp(-r * r * 3.0) + 120.0
    v += 300.0 * math.exp(-math.pow((r - 0.22) * 40, 2)) + 180.0 * math.exp(-math.pow((r - 0.37) * 50, 2))
    var sp = 0
    while (sp < 6) {
      val sx = u(s, 3 * sp); val sy = u(s, 3 * sp + 1)
      val d2 = (x - sx) * (x - sx) + (y - sy) * (y - sy)
      v += 2500.0 * u(s, 3 * sp + 2) * math.exp(-d2 * 8000.0)
      sp += 1
    }
    v
  }
}

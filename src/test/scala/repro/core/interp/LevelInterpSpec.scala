package repro.core.interp

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGrids
import repro.core.{GridData, Metrics}

class LevelInterpSpec extends AnyFunSuite {

  private val allConfigs: Seq[LevelConfig] = {
    val active3 = Array(0, 1, 2)
    Seq(
      LevelConfig(Spline.Kind.Linear, Paradigm.OneD(active3), sameLevel = false),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(active3), sameLevel = false),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(active3.reverse), sameLevel = false),
      LevelConfig(Spline.Kind.Natural, Paradigm.OneD(active3), sameLevel = false),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(active3), sameLevel = true),
      LevelConfig(Spline.Kind.Natural, Paradigm.OneD(active3), sameLevel = true),
      LevelConfig(Spline.Kind.Linear, Paradigm.MultiDim, sameLevel = false),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.MultiDim, sameLevel = false),
      LevelConfig(Spline.Kind.Natural, Paradigm.MultiDim, sameLevel = false),
    )
  }

  private def roundTrip(grid: GridData, plan: InterpPlan, eb: Double): GridData = {
    val work = grid.copyGrid
    val res = LevelInterp.compressWith(work, plan)
    val back = LevelInterp.decompressWith(plan, res.codes, res.outliers, res.anchors)
    // decompression must EXACTLY equal the compressor's reconstruction
    assert(back.data.toSeq == work.data.toSeq, "decompression != compressor reconstruction")
    // and must satisfy the bound against the original
    val maxErr = Metrics.maxAbsError(grid.data, back.data)
    assert(maxErr <= eb + 1e-12, s"bound violated: $maxErr > $eb for plan $plan")
    back
  }

  test("every 3-D config round-trips within the bound (fvfi on/off)") {
    val g = TestGrids.smooth3D()
    val eb = 1e-3
    for (cfg <- allConfigs; fvfi <- Seq(true, false)) {
      val plan = InterpPlan.uniform(g.dims, 32, cfg, eb, fvfi)
      roundTrip(g, plan, eb)
    }
  }

  test("total predicted points + anchors == grid size") {
    val g = TestGrids.smooth3D(17, 19, 23) // awkward primes
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 1e-3)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    assert(res.codes.length + res.anchors.length == g.size)
  }

  test("multi-dim paradigm covers all points too") {
    val g = TestGrids.smooth3D(17, 19, 23)
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.Natural, Paradigm.MultiDim, sameLevel = false), 1e-3)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    assert(res.codes.length + res.anchors.length == g.size)
    roundTrip(g, plan, 1e-3)
  }

  test("same-level split covers all points") {
    val g = TestGrids.smooth3D(33, 16, 9)
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.Natural, Paradigm.OneD(Array(0, 1, 2)), sameLevel = true), 1e-3)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    assert(res.codes.length + res.anchors.length == g.size)
    roundTrip(g, plan, 1e-3)
  }

  test("2-D grids round-trip") {
    val g = TestGrids.smooth2D()
    for (p <- Seq(Paradigm.OneD(Array(0, 1)): Paradigm, Paradigm.MultiDim)) {
      val plan = InterpPlan.uniform(g.dims, 32,
        LevelConfig(Spline.Kind.NotAKnot, p, sameLevel = false), 1e-4)
      roundTrip(g, plan, 1e-4)
    }
  }

  test("1-D grids round-trip") {
    val g = TestGrids.smooth1D()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0)), sameLevel = true), 1e-4)
    roundTrip(g, plan, 1e-4)
  }

  test("frozen dimension round-trips and stores stride-1 anchors") {
    val g = TestGrids.roughDim0()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(1, 2)), sameLevel = false),
      1e-3, fvfi = true, frozenDim = 0)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    // anchors: full dim0 × anchor lattice on dims 1,2
    assert(res.anchors.length == g.dims(0) * 1 * 1)
    roundTrip(g, plan, 1e-3)
  }

  test("frozen dim massively reduces quantization entropy on rough-dim data") {
    val g = TestGrids.roughDim0()
    val eb = 1e-4
    val cfgU = LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false)
    val cfgF = LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(1, 2)), sameLevel = false)
    val tNo = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32, cfgU, eb))
    val tFr = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32, cfgF, eb, fvfi = true, frozenDim = 0))
    assert(tFr.meanAbsErr < tNo.meanAbsErr / 5,
      s"freezing should slash prediction error: ${tFr.meanAbsErr} vs ${tNo.meanAbsErr}")
  }

  test("anchors are lossless") {
    val g = TestGrids.smooth3D()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.Linear, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 0.5)
    val back = roundTrip(g, plan, 0.5)
    // anchor positions must be exact
    for (i <- 0 until g.dims(0) by 32; j <- 0 until g.dims(1) by 32; k <- 0 until g.dims(2) by 32)
      assert(back(Array(i, j, k)) == g(Array(i, j, k)))
  }

  test("per-level error bounds are respected (higher level tighter)") {
    val g = TestGrids.smooth3D()
    val e = 1e-2
    val ebs = InterpPlan.levelEbs(e, 2.0, 4.0, 5)
    assert(ebs(0) == e)           // level 1: global bound
    assert(ebs(4) == e / 4.0)     // level 5: capped by beta
    val cfg = LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false)
    val plan = InterpPlan(g.dims, 32, -1, Array.fill(5)(cfg), ebs,
      Array.fill(3)(1.0 / 3), fvfi = true, 0, Array.emptyByteArray)
    roundTrip(g, plan, e) // global bound still holds (level ebs are all <= e)
  }

  test("block-wise spline override round-trips") {
    val g = TestGrids.smooth3D(40, 40, 40)
    val cfg = LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false)
    val bDims = g.dims.map(d => (d + 31) / 32)
    val blockSplines = Array.tabulate[Byte](bDims.product)(i => (i % 3).toByte)
    val plan = InterpPlan.uniform(g.dims, 32, cfg, 1e-3)
      .copy(blockSize = 32, blockSplines = blockSplines)
    roundTrip(g, plan, 1e-3)
  }

  test("noise input: bound still holds, outliers absorbed") {
    val g = TestGrids.noise3D()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.MultiDim, sameLevel = false), 1e-5)
    roundTrip(g, plan, 1e-5)
  }

  test("constant input: zero prediction error everywhere") {
    val g = TestGrids.const3D()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.Natural, Paradigm.MultiDim, sameLevel = false), 1e-6)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    assert(res.outliers.isEmpty)
    assert(res.codes.forall(_ == LevelInterp.Radius)) // all exact
  }

  test("fvfi and non-fvfi produce identical codes (order differs only in memory walk)") {
    // For the 1D paradigm along the LAST dim only, traversal order does not
    // change the set/order of predictions... in general orders differ, so
    // we instead check both satisfy the bound and produce the same ratio
    // class of outputs (same code multiset for a separable smooth field).
    val g = TestGrids.smooth3D(16, 16, 16)
    val cfg = LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false)
    val p1 = InterpPlan.uniform(g.dims, 32, cfg, 1e-3, fvfi = true)
    val p2 = InterpPlan.uniform(g.dims, 32, cfg, 1e-3, fvfi = false)
    val r1 = LevelInterp.compressWith(g.copyGrid, p1)
    val r2 = LevelInterp.compressWith(g.copyGrid, p2)
    assert(r1.codes.length == r2.codes.length)
    assert(r1.codes.sorted.toSeq == r2.codes.sorted.toSeq)
  }

  test("trial stats are consistent with compression") {
    val g = TestGrids.smooth3D()
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 1e-3)
    val t = LevelInterp.trial(g, plan)
    val res = LevelInterp.compressWith(g.copyGrid, plan)
    assert(t.nPredicted == res.codes.length)
    assert(t.nAnchors == res.anchors.length)
    assert(t.perLevelCnt.sum == t.nPredicted)
    assert(t.meanAbsErr >= 0)
    assert(t.totalBits > 0)
  }

  test("cubic beats linear on smooth data (prediction accuracy)") {
    val g = TestGrids.smooth3D()
    val lin = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.Linear, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 1e-3))
    val cub = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 1e-3))
    assert(cub.meanAbsErr < lin.meanAbsErr)
  }

  test("multi-dim interpolation beats 1D-style on isotropic smooth data (Thm 5.1)") {
    val g = GridData.toFloatPrecision(GridData.tabulate(Array(32, 32, 32)) { c =>
      math.sin(c(0) * 0.25) + math.sin(c(1) * 0.25) + math.sin(c(2) * 0.25)
    })
    val oneD = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(0, 1, 2)), sameLevel = false), 1e-4))
    val multi = LevelInterp.trial(g, InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.MultiDim, sameLevel = false), 1e-4))
    assert(multi.meanAbsErr < oneD.meanAbsErr,
      s"multi ${multi.meanAbsErr} should beat 1D ${oneD.meanAbsErr}")
  }

  test("dims smaller than anchor stride still work") {
    val g = TestGrids.smooth3D(5, 6, 7)
    val plan = InterpPlan.uniform(g.dims, 32,
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.MultiDim, sameLevel = false), 1e-3)
    roundTrip(g, plan, 1e-3)
  }

  test("plan serialization round-trips") {
    val cfgs = Array(
      LevelConfig(Spline.Kind.Natural, Paradigm.MultiDim, sameLevel = false),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.OneD(Array(2, 1)), sameLevel = true),
      LevelConfig(Spline.Kind.Linear, Paradigm.OneD(Array(1, 2)), sameLevel = false),
      LevelConfig(Spline.Kind.Natural, Paradigm.OneD(Array(2, 1)), sameLevel = true),
      LevelConfig(Spline.Kind.NotAKnot, Paradigm.MultiDim, sameLevel = false),
    )
    val plan = InterpPlan(Array(10, 20, 30), 32, 0, cfgs,
      Array(1e-3, 5e-4, 2.5e-4, 2.5e-4, 2.5e-4), Array(0.2, 0.3, 0.5),
      fvfi = true, 32, Array[Byte](0, 1, 2))
    val w = new repro.core.ByteWriter()
    InterpPlan.serialize(w, plan)
    val back = InterpPlan.deserialize(new repro.core.ByteReader(w.toBytes))
    assert(back.dims.toSeq == plan.dims.toSeq)
    assert(back.anchorStride == plan.anchorStride)
    assert(back.frozenDim == plan.frozenDim)
    assert(back.fvfi == plan.fvfi)
    assert(back.blockSize == plan.blockSize)
    assert(back.blockSplines.toSeq == plan.blockSplines.toSeq)
    assert(back.levelEbs.toSeq == plan.levelEbs.toSeq)
    (back.levelConfigs zip plan.levelConfigs).foreach { case (a, b) =>
      assert(a.spline == b.spline)
      assert(a.sameLevel == b.sameLevel)
      (a.paradigm, b.paradigm) match {
        case (Paradigm.OneD(x), Paradigm.OneD(y)) => assert(x.toSeq == y.toSeq)
        case (x, y)                               => assert(x == y)
      }
    }
    // dimWeights stored as float32
    (back.dimWeights zip plan.dimWeights).foreach { case (a, b) =>
      assert(math.abs(a - b) < 1e-6)
    }
  }
}

package repro.eval

import org.scalatest.funsuite.AnyFunSuite

/** Tests of the measurement harness at miniature scale (shrink 0.15). */
class EvalSpec extends AnyFunSuite {

  private val shrink = 0.15

  test("compressor registry covers the paper's seven columns") {
    Eval.CompressorNames.foreach(n => assert(Eval.compressor(n).name == n))
    assert(Eval.CompressorNames.size == 7)
    intercept[IllegalArgumentException](Eval.compressor("nope"))
  }

  test("run produces consistent metrics and caches") {
    val r1 = Eval.run("Miranda", "ZFP 0.5.5", 1e-3, shrink)
    val r2 = Eval.run("Miranda", "ZFP 0.5.5", 1e-3, shrink)
    assert(r1 eq r2) // cached
    assert(r1.cr > 1.0)
    assert(r1.psnr > 40)
    assert(r1.ssim <= 1.0)
    assert(r1.compMBps > 0 && r1.decompMBps > 0)
    assert(r1.bitRate > 0 && r1.bitRate < 32)
  }

  test("CR increases with looser bounds") {
    val tight = Eval.run("Miranda", "HPEZ", 1e-4, shrink)
    val loose = Eval.run("Miranda", "HPEZ", 1e-2, shrink)
    assert(loose.cr > tight.cr)
    assert(loose.psnr < tight.psnr)
  }

  test("atPsnr interpolates between grid points") {
    val runs = Eval.EpsGrid.map(e => Eval.run("Miranda", "SPERR 0.6", e, shrink))
    val target = (runs.map(_.psnr).min + runs.map(_.psnr).max) / 2
    val r = Eval.atPsnr("Miranda", "SPERR 0.6", target, shrink)
    assert(math.abs(r.psnr - target) < 1e-9)
    assert(r.compressedBytes >= runs.map(_.compressedBytes).min)
    assert(r.compressedBytes <= runs.map(_.compressedBytes).max)
  }

  test("atPsnr clamps outside the grid") {
    val lo = Eval.atPsnr("Miranda", "ZFP 0.5.5", -10, shrink)
    val hi = Eval.atPsnr("Miranda", "ZFP 0.5.5", 1e9, shrink)
    assert(lo.compressedBytes <= hi.compressedBytes)
  }

  test("table formatters include both measured and paper rows") {
    val t1 = Tables.table1(shrink)
    assert(t1.contains("449x449x235")) // paper dims shown
    assert(t1.contains("CESM") && t1.contains("APS"))
  }

  test("paper reference tables are complete") {
    for (d <- repro.data.SciData.floatDatasets) {
      assert(PaperNumbers.table2Comp(d).size == 7)
      assert(PaperNumbers.table2Decomp(d).size == 7)
      assert(PaperNumbers.table5AtoB(d).size == 8)
      assert(PaperNumbers.table5BtoA(d).size == 8)
      for (e <- Seq(1e-2, 1e-3, 1e-4)) {
        assert(PaperNumbers.table3.contains((d, e)))
        assert(PaperNumbers.table4.contains((d, e)))
      }
    }
  }
}

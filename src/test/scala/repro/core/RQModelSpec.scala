package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.analysis.Metrics
import repro.compressor.{Compressor, Predictor}
import repro.data.SciData

/** End-to-end model-vs-measured checks: the heart of the reproduction.
  * Thresholds are deliberately looser than the bench-scale Table II numbers
  * (test-scale fields are small, so sampling noise is larger), but tight
  * enough to catch a broken model stage.
  */
class RQModelSpec extends AnyFunSuite {

  private lazy val fields = Seq(
    SciData.rtmSnapshot3d(2000)(Array(24, 32, 32), 101),
    SciData.climate2d(Array(90, 180), 202),
    SciData.brownian1d(Array(32768), 601),
  )
  private val ebRels = Seq(1e-4, 1e-3, 1e-2, 5e-2)

  for (p <- Predictor.all) {
    test(s"${p.name}: Huffman bit-rate estimate within 25% across the sweep") {
      fields.foreach { f =>
        val model = RQModel.build(f, p)
        ebRels.foreach { r =>
          val eb = r * f.valueRange
          val est = model.estimate(eb)
          val meas = Compressor.compress(f, eb, p)
          val ratio = est.huffBitRate / meas.huffBitRate
          assert(ratio > 0.75 && ratio < 1.35,
            s"dims=${f.dims.mkString("x")} ebRel=$r est=${est.huffBitRate} meas=${meas.huffBitRate}")
        }
      }
    }

    test(s"${p.name}: PSNR estimate within 6 dB across the sweep") {
      // 6 dB covers the hardest regime (extreme eb, reconstruction drift);
      // mid-sweep accuracy is far tighter — see the Table II bench.
      fields.foreach { f =>
        val model = RQModel.build(f, p)
        ebRels.foreach { r =>
          val eb = r * f.valueRange
          val est = model.estimate(eb)
          val meas = Metrics.psnr(f, Compressor.compress(f, eb, p).recon)
          assert(math.abs(est.psnr - meas) < 6.0,
            s"dims=${f.dims.mkString("x")} ebRel=$r est=${est.psnr} meas=$meas")
        }
      }
    }

    test(s"${p.name}: estimated bit-rate is monotone non-increasing in eb") {
      val f = fields.head
      val model = RQModel.build(f, p)
      val bs = Seq(1e-5, 1e-4, 1e-3, 1e-2, 5e-2, 2e-1).map(r => model.estimate(r * f.valueRange).huffBitRate)
      bs.sliding(2).foreach { case Seq(a, b) => assert(b <= a + 0.15, bs.toString) }
    }

    test(s"${p.name}: estimated PSNR is monotone decreasing in eb") {
      val f = fields.head
      val model = RQModel.build(f, p)
      val ps = Seq(1e-5, 1e-4, 1e-3, 1e-2).map(r => model.estimate(r * f.valueRange).psnr)
      ps.sliding(2).foreach { case Seq(a, b) => assert(b < a, ps.toString) }
    }
  }

  test("errorBoundForBitRate: compressing at the returned eb lands near the target") {
    val f = fields.head
    val p = Predictor.byName("lorenzo")
    val model = RQModel.build(f, p)
    Seq(2.0, 4.0, 6.0).foreach { target =>
      val eb = model.errorBoundForBitRate(target, withLossless = false)
      val meas = Compressor.compress(f, eb, p).huffBitRate
      assert(math.abs(meas - target) < 1.5, s"target=$target measured=$meas eb=$eb")
    }
  }

  test("errorBoundForBitRate: low-bit-rate targets use the RLE/anchor regime") {
    val f = SciData.climate2d(Array(90, 180), 202)
    val p = Predictor.byName("lorenzo")
    val model = RQModel.build(f, p)
    val eb = model.errorBoundForBitRate(0.9, withLossless = true)
    val meas = Compressor.compress(f, eb, p)
    val measB = meas.huffLLBitRate
    assert(measB < 2.5, s"target=0.9 measured=$measB eb=$eb")
  }

  test("errorBoundForBitRate is monotone decreasing in the target") {
    val f = fields.head
    val model = RQModel.build(f, Predictor.byName("lorenzo"))
    val ebs = Seq(1.5, 3.0, 5.0, 8.0).map(b => model.errorBoundForBitRate(b, withLossless = false))
    ebs.sliding(2).foreach { case Seq(a, b) => assert(b < a, ebs.toString) }
  }

  test("errorBoundForPsnr: measured PSNR lands within 3 dB of the target") {
    val f = fields.head
    val p = Predictor.byName("lorenzo")
    val model = RQModel.build(f, p)
    Seq(45.0, 60.0, 80.0).foreach { target =>
      val eb = model.errorBoundForPsnr(target)
      val meas = Metrics.psnr(f, Compressor.compress(f, eb, p).recon)
      assert(math.abs(meas - target) < 4.0, s"target=$target measured=$meas")
    }
  }

  test("estimate is deterministic") {
    val f = fields.head
    val model = RQModel.build(f, Predictor.byName("lorenzo"))
    val a = model.estimate(1e-3)
    val b = model.estimate(1e-3)
    assert(a == b)
  }

  test("estTotalBytes is within 2x of the real blob size") {
    fields.foreach { f =>
      val p = Predictor.byName("lorenzo")
      val model = RQModel.build(f, p)
      Seq(1e-3, 1e-2).foreach { r =>
        val eb = r * f.valueRange
        val est = model.estimate(eb).estTotalBytes
        val meas = Compressor.compress(f, eb, p).huffPlusLLBytes
        val ratio = est.toDouble / meas
        assert(ratio > 0.5 && ratio < 2.0, s"ebRel=$r est=$est meas=$meas")
      }
    }
  }

  test("accuracyError (Eq. 20): identical series has zero error") {
    assert(RQModel.accuracyError(Seq(1.0, 2.0, 3.0), Seq(1.0, 2.0, 3.0)) == 0.0)
  }

  test("accuracyError: uniform scaling is pure bias, STD small") {
    // Eq. 20 uses STD, so a constant multiplicative offset contributes nothing
    val e = RQModel.accuracyError(Seq(1.0, 2.0, 3.0), Seq(1.1, 2.2, 3.3))
    assert(e < 1e-12)
  }

  test("accuracyError grows with scatter") {
    val small = RQModel.accuracyError(Seq(1.0, 2.0, 3.0), Seq(1.02, 1.96, 3.05))
    val large = RQModel.accuracyError(Seq(1.0, 2.0, 3.0), Seq(1.5, 1.4, 4.5))
    assert(small < large)
  }

  test("accuracyErrorFloored ignores sub-floor magnitudes") {
    val e = RQModel.accuracyErrorFloored(Seq(0.001, 1.0), Seq(0.04, 1.0), floor = 0.05)
    assert(e == 0.0)
  }
}

package repro

import repro.compressor._
import repro.core.{Feedback, RQModel}
import repro.data.SciData

/** Calibration harness for the Feedback drift constants: scans candidates
  * and prints the aggregate Eq. 20 error over a field × predictor × eb sweep.
  */
object ProbeCalibrate {
  def main(args: Array[String]): Unit = {
    val fields = Seq(
      "turb" -> SciData.turbulence3d(Array(24, 32, 32), 701),
      "rtm" -> SciData.rtmSnapshot3d(2000)(Array(24, 32, 32), 101),
      "cesm" -> SciData.climate2d(Array(90, 180), 202),
      "brown" -> SciData.brownian1d(Array(32768), 601),
      "nyxT" -> SciData.cosmoTemp3d(Array(32, 32, 32), 402),
      "scale" -> SciData.pressure3d(Array(7, 60, 60), 901),
    )
    val ebRels = Seq(1e-4, 5e-4, 1e-3, 5e-3, 1e-2, 5e-2)

    case class M(field: String, pred: String, ebRel: Double, huffB: Double, llB: Double, psnr: Double)
    val measured = for ((name, f) <- fields; p <- Predictor.all; r <- ebRels) yield {
      val res = Compressor.compress(f, r * f.valueRange, p)
      M(name, p.name, r, res.huffBitRate, res.huffLLBitRate, repro.analysis.Metrics.psnr(f, res.recon))
    }

    for (cl <- Seq(0.5, 1.0, 2.0, 3.0); ci <- Seq(0.25, 0.5, 1.0)) {
      Feedback.CdLorenzo = cl
      Feedback.CdInterp = ci
      val errs = for ((name, f) <- fields; p <- Predictor.all) yield {
        val model = RQModel.build(f, p)
        val ests = ebRels.map(r => model.estimate(r * f.valueRange))
        val ms = measured.filter(m => m.field == name && m.pred == p.name)
        val eHuff = RQModel.accuracyError(ms.map(_.huffB), ests.map(_.huffBitRate))
        val eLL = RQModel.accuracyErrorFloored(ms.map(_.llB), ests.map(_.llBitRate))
        val ePsnr = RQModel.accuracyError(ms.map(_.psnr), ests.map(_.psnr))
        (p.name, eHuff, eLL, ePsnr)
      }
      def avg(p: String, f: ((String, Double, Double, Double)) => Double): Double = {
        val xs = errs.filter(_._1 == p).map(f)
        xs.sum / xs.length
      }
      println(f"cl=$cl%4.2f ci=$ci%4.2f | " +
        Predictor.all.map(_.name).map { p =>
          f"$p: huff=${avg(p, _._2) * 100}%5.2f%% ll=${avg(p, _._3) * 100}%5.2f%% psnr=${avg(p, _._4) * 100}%5.2f%%"
        }.mkString("  "))
    }
    Feedback.CdLorenzo = 1.0
    Feedback.CdInterp = 0.5
  }
}

package repro

import scala.concurrent.{Await, Future}
import scala.concurrent.duration._
import scala.concurrent.ExecutionContext.Implicits.global
import repro.compressor._
import repro.core.{Feedback, RQModel}
import repro.data.SciData
import repro.experiments.TableII

/** Bench-scale Table II columns without Spark, parallelized with Futures —
  * the calibration loop for the Feedback constants.
  */
object Probe3 {
  def main(args: Array[String]): Unit = {
    case class M(id: String, ebRel: Double, huffB: Double, llB: Double, psnr: Double, ssim: Double)
    val measured = Await.result(Future.traverse(SciData.fields) { spec =>
      Future {
        val f = spec.generate(test = false)
        val range = f.valueRange
        TableII.EbSweep.map { r =>
          val eb = math.max(r * range, 1e-300)
          val res = Compressor.compress(f, eb, LorenzoPredictor)
          M(spec.id, r, res.huffBitRate, res.huffLLBitRate,
            repro.analysis.Metrics.psnr(f, res.recon),
            repro.analysis.Metrics.ssimGlobal(f, res.recon))
        }
      }
    }, 30.minutes).flatten

    for (cl <- Seq(0.5, 1.0, 2.0); ml <- Seq(1.0)) {
      Feedback.AlphaLorenzo = cl
      ()
      val rows = SciData.fields.map { spec =>
        val f = spec.generate(test = false)
        val range = f.valueRange
        val model = RQModel.build(f, LorenzoPredictor)
        val ests = TableII.EbSweep.map(r => model.estimate(math.max(r * range, 1e-300)))
        val ms = measured.filter(_.id == spec.id).sortBy(_.ebRel)
        val eH = RQModel.accuracyError(ms.map(_.huffB), ests.map(_.huffBitRate))
        val eL = RQModel.accuracyErrorFloored(ms.map(_.llB), ests.map(_.llBitRate))
        val eP = RQModel.accuracyError(ms.map(_.psnr), ests.map(_.psnr))
        val eS = RQModel.accuracyError(ms.map(_.ssim), ests.map(_.ssim))
        (spec.id, eH, eL, eP, eS)
      }
      def avg(f: ((String, Double, Double, Double, Double)) => Double) = rows.map(f).sum / rows.length
      println(f"cl=$cl%3.1f mu=$ml%3.1f | huff=${avg(_._2) * 100}%5.2f%% h+ll=${avg(_._3) * 100}%5.2f%% psnr=${avg(_._4) * 100}%5.2f%% ssim=${avg(_._5) * 100}%5.2f%%")
      if (args.contains("-v")) rows.foreach { case (id, eH, eL, eP, eS) =>
        println(f"    $id%-28s huff=${eH * 100}%6.2f%% h+ll=${eL * 100}%6.2f%% psnr=${eP * 100}%6.2f%% ssim=${eS * 100}%6.2f%%")
      }
    }
    Feedback.AlphaLorenzo = 1.0
    
  }
}

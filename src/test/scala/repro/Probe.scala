package repro

import repro.compressor._
import repro.core.{Field, RQModel}
import repro.data.SciData

/** Scratch diagnostics runner (not a test): prints measured vs modeled
  * quantities to calibrate test/bench assertions.
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val fields = Seq(
      "turb" -> SciData.turbulence3d(Array(24, 32, 32), 701),
      "rtm" -> SciData.rtmSnapshot3d(2000)(Array(24, 32, 32), 101),
      "cesm" -> SciData.climate2d(Array(90, 180), 202),
      "brown" -> SciData.brownian1d(Array(32768), 601),
    )
    for ((name, f) <- fields; p <- Predictor.all) {
      val range = f.valueRange
      val model = RQModel.build(f, p)
      println(s"== $name ${p.name} range=$range")
      for (ebRel <- Seq(1e-4, 1e-3, 1e-2, 5e-2)) {
        val eb = ebRel * range
        val res = Compressor.compress(f, eb, p)
        val est = model.estimate(eb)
        println(f"  ebRel=$ebRel%8.0e p0=${res.p0}%5.3f/${est.p0}%5.3f " +
          f"huffB=${res.huffBitRate}%6.3f/${est.huffBitRate}%6.3f " +
          f"llB=${res.huffLLBitRate}%6.3f/${est.llBitRate}%6.3f " +
          f"deflGain=${res.losslessGain}%5.2f rleGain=${res.huffPayloadBits.toDouble / res.rleBits}%5.2f " +
          f"psnr=${repro.analysis.Metrics.psnr(f, res.recon)}%6.2f/${est.psnr}%6.2f " +
          f"ssim=${repro.analysis.Metrics.ssimGlobal(f, res.recon)}%6.4f/${est.ssim}%6.4f")
      }
    }
  }
}

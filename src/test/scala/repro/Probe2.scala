package repro

import repro.compressor._
import repro.core.RQModel
import repro.data.SciData
import repro.experiments.TableII

/** Per-eb diagnostics for the Table II lossless column on the worst fields. */
object Probe2 {
  def main(args: Array[String]): Unit = {
    val specs = Seq("Brown" -> "pressure", "HACC" -> "xx", "SCALE" -> "PRES",
      "CESM" -> "TS", "Nyx" -> "dark_matter_density", "EXAFEL" -> "raw", "Hurricane" -> "TC")
    specs.foreach { case (ds, fn) =>
      val f = SciData.byId(ds, fn).generate(test = false)
      val range = f.valueRange
      val model = RQModel.build(f, LorenzoPredictor)
      println(s"== $ds/$fn")
      TableII.EbSweep.foreach { r =>
        val eb = math.max(r * range, 1e-300)
        val est = model.estimate(eb)
        val res = Compressor.compress(f, eb, LorenzoPredictor)
        println(f"  ebRel=$r%8.1e p0=${res.p0}%5.3f/${est.p0}%5.3f huffB=${res.huffBitRate}%7.3f/${est.huffBitRate}%7.3f " +
          f"llB=${res.huffLLBitRate}%7.3f/${est.llBitRate}%7.3f gain=${res.losslessGain}%6.2f/${est.huffBitRate / math.max(est.llBitRate, 1e-9)}%6.2f")
      }
    }
  }
}

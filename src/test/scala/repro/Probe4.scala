package repro

import repro.compressor._
import repro.core._
import repro.data.SciData

/** Focused diagnostics: patch-sim internals vs measured, one field. */
object Probe4 {
  def main(args: Array[String]): Unit = {
    val specs = Seq(("Hurricane", "TC"), ("CESM", "TS"), ("SCALE", "PRES"), ("HACC", "xx"))
    specs.foreach { case (ds, fn) =>
      val f = SciData.byId(ds, fn).generate(test = false)
      val range = f.valueRange
      println(s"== $ds/$fn range=$range")
      val model = RQModel.build(f, LorenzoPredictor)
      Seq(1e-3, 2.5e-3, 5e-3, 1e-2, 2.5e-2, 5e-2).foreach { r =>
        val eb = r * range
        val sim = PatchSim.simulate(model.sample.patches, eb)
        val res = Compressor.compress(f, eb, LorenzoPredictor)
        val est = model.estimate(eb)
        val measVar = {
          var s = 0.0; var i = 0
          while (i < f.size) { val d = res.recon.data(i) - f.data(i); s += d * d; i += 1 }
          s / f.size
        }
        println(f"  r=$r%8.1e p0=${res.p0}%5.3f/${est.p0}%5.3f llB=${res.huffLLBitRate}%6.3f/${est.llBitRate}%6.3f " +
          f"errVar=${measVar}%9.3e/${est.errVariance}%9.3e unif=${eb * eb / 3}%9.3e " +
          f"| sim: vN=${sim.varNear}%9.3e vF=${sim.varFar}%9.3e d=${sim.deltaSteps}%4.1f g=${sim.driftGrowthPerStep}%9.3e nz=${sim.nonZeroRate}%6.4f")
      }
    }
  }
}

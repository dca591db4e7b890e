package repro.usecases

import repro.compressor.{Compressor, Predictor}
import repro.core.{Field, RQModel}

/** Use-case 3 (§IV-C, Figs. 12–13): fine-grained error-bound tuning across
  * the partitions (timesteps / ranks) that jointly feed a post-hoc analysis.
  *
  * The RTM stacked image is the paper's example: the final image sums the
  * per-timestep images, so independent compression errors add in variance and
  * the overall quality is governed by Σ_t σ²_t. A single shared error bound
  * (the traditional approach) wastes bits on easy timesteps; the model lets
  * us solve, per partition,
  *
  *     min Σ_t bits_t(e_t)  s.t.  Σ_t σ²_t(e_t) ≤ V*
  *
  * via the Lagrangian: for a multiplier λ each partition independently picks
  * e_t minimizing bits_t(e) + λ·σ²_t(e) (a per-partition 1-D search over the
  * model — no compression), and λ is bisected until the variance budget is
  * met. This is exactly the "exponentially many combinations" the paper says
  * trial-and-error cannot search (§IV-C).
  */
object InSitu {

  final case class Allocation(ebs: Array[Double], estBits: Double, estVariance: Double)

  /** Per-partition error bounds meeting the total-variance budget `vStar`. */
  def optimize(models: Seq[RQModel], vStar: Double, ebGridPerPartition: Seq[Array[Double]]): Allocation = {
    require(models.length == ebGridPerPartition.length)
    def allocate(lambda: Double): Allocation = {
      val ebs = new Array[Double](models.length)
      var bits = 0.0
      var v = 0.0
      var t = 0
      while (t < models.length) {
        val m = models(t)
        val grid = ebGridPerPartition(t)
        var best = grid(0)
        var bestCost = Double.MaxValue
        var bestBits = 0.0
        var bestVar = 0.0
        grid.foreach { e =>
          val est = m.estimate(e)
          val b = est.llBitRate * m.sample.totalPoints
          val cost = b + lambda * est.errVariance
          if (cost < bestCost) { bestCost = cost; best = e; bestBits = b; bestVar = est.errVariance }
        }
        ebs(t) = best; bits += bestBits; v += bestVar
        t += 1
      }
      Allocation(ebs, bits, v)
    }
    // λ=0 → each partition takes its largest eb (min bits, max variance).
    // Increasing λ tightens quality. Bisection on log λ.
    var lo = 1e-12
    var hi = 1e18
    var out = allocate(lo)
    if (out.estVariance <= vStar) return out
    var i = 0
    while (i < 80) {
      val mid = math.sqrt(lo * hi)
      val a = allocate(mid)
      if (a.estVariance <= vStar) { hi = mid; out = a } else lo = mid
      i += 1
    }
    out
  }

  /** Measured outcome of compressing every partition at the given ebs. */
  final case class MeasuredOutcome(totalBytes: Long, totalBits: Double, sumErrVariance: Double, bitRate: Double)

  def compressAll(parts: Seq[Field], ebs: Seq[Double], predictor: Predictor): MeasuredOutcome = {
    var bytes = 0L
    var sumVar = 0.0
    var n = 0L
    parts.zip(ebs).foreach { case (f, e) =>
      val res = Compressor.compress(f, e, predictor)
      bytes += res.huffPlusLLBytes
      var s = 0.0
      var i = 0
      while (i < f.size) { val d = res.recon.data(i) - f.data(i); s += d * d; i += 1 }
      sumVar += s / f.size
      n += f.size
    }
    MeasuredOutcome(bytes, bytes * 8.0, sumVar, bytes * 8.0 / n)
  }

  /** The traditional baseline: one shared eb for all partitions, chosen (via
    * the models, to keep the comparison about *allocation*, not inversion) as
    * the largest eb on the grid meeting the same variance budget.
    */
  def uniformBaseline(models: Seq[RQModel], vStar: Double, ebGrid: Array[Double]): Double = {
    val candidates = ebGrid.sorted.reverse
    candidates.find { e =>
      models.map(_.estimate(e).errVariance).sum <= vStar
    }.getOrElse(candidates.last)
  }
}

package repro.usecases

import repro.analysis.Metrics
import repro.compressor.{Compressor, Predictor}
import repro.core.{Field, RQEstimate, RQModel}

/** Use-case 1 (§IV-A, Fig. 10): select the best-fit predictor for a given
  * error bound / target bit-rate from the model's rate-distortion estimates —
  * one sampling pass per predictor, no trial compression.
  */
object PredictorSelection {

  /** A predictor's estimated rate-distortion curve. */
  final case class Curve(predictor: String, points: Seq[RQEstimate])

  /** Model-estimated rate-distortion curves for every predictor. */
  def estimateCurves(field: Field, ebRels: Seq[Double],
                     predictors: Seq[Predictor] = Predictor.all,
                     sampleRate: Double = 0.01): Seq[Curve] = {
    val range = field.valueRange
    predictors.map { p =>
      val model = RQModel.build(field, p, sampleRate)
      Curve(p.name, ebRels.map(r => model.estimate(math.max(r * range, 1e-300))))
    }
  }

  /** Measured rate-distortion points (the trial-and-error ground truth). */
  final case class MeasuredPoint(predictor: String, ebRel: Double, bitRate: Double, psnr: Double)

  def measureCurves(field: Field, ebRels: Seq[Double],
                    predictors: Seq[Predictor] = Predictor.all): Seq[MeasuredPoint] = {
    val range = field.valueRange
    for (p <- predictors; r <- ebRels) yield {
      val res = Compressor.compress(field, math.max(r * range, 1e-300), p)
      MeasuredPoint(p.name, r, res.huffLLBitRate, Metrics.psnr(field, res.recon))
    }
  }

  /** The predictor the model recommends at a given error bound: highest
    * estimated PSNR per estimated bit (here: best PSNR at the bit-rate the
    * predictor achieves for this eb — the paper picks the curve that is
    * higher at the operating point).
    */
  def selectAtErrorBound(field: Field, ebRel: Double,
                         predictors: Seq[Predictor] = Predictor.all): String = {
    val range = field.valueRange
    val cands = predictors.map { p =>
      val est = RQModel.build(field, p).estimate(math.max(ebRel * range, 1e-300))
      (p.name, est.llBitRate, est.psnr)
    }
    // dominance at fixed quality: fewer bits for ~equal PSNR wins; compare by
    // PSNR − κ·bits with κ from the local trade-off (6 dB ≈ 1 bit).
    cands.maxBy { case (_, bits, psnr) => psnr - 6.02 * bits }._1
  }

  /** The bit-rate below which `b` overtakes `a` on estimated PSNR-at-bit-rate
    * (the paper's Lorenzo→interpolation switch near 1.9 bits). Scans the
    * estimated curves on a common bit-rate grid; None if no crossover.
    */
  def crossoverBitRate(field: Field, a: Predictor, b: Predictor,
                       ebRels: Seq[Double]): Option[Double] = {
    val range = field.valueRange
    val ma = RQModel.build(field, a)
    val mb = RQModel.build(field, b)
    val pa = ebRels.map(r => ma.estimate(math.max(r * range, 1e-300))).sortBy(_.llBitRate)
    val pb = ebRels.map(r => mb.estimate(math.max(r * range, 1e-300))).sortBy(_.llBitRate)
    def psnrAt(points: Seq[RQEstimate], bits: Double): Option[Double] = {
      if (points.isEmpty || bits < points.head.llBitRate || bits > points.last.llBitRate) None
      else {
        val i = points.lastIndexWhere(_.llBitRate <= bits)
        val lo = points(i)
        val hi = if (i + 1 < points.length) points(i + 1) else lo
        if (hi.llBitRate == lo.llBitRate) Some(lo.psnr)
        else Some(lo.psnr + (hi.psnr - lo.psnr) * (bits - lo.llBitRate) / (hi.llBitRate - lo.llBitRate))
      }
    }
    val minB = math.max(pa.head.llBitRate, pb.head.llBitRate)
    val maxB = math.min(pa.last.llBitRate, pb.last.llBitRate)
    if (minB >= maxB) return None
    val grid = (0 to 200).map(i => minB + (maxB - minB) * i / 200.0)
    val signs = grid.flatMap { bits =>
      for (qa <- psnrAt(pa, bits); qb <- psnrAt(pb, bits)) yield (bits, qb - qa)
    }
    signs.sliding(2).collectFirst {
      case Seq((b1, d1), (b2, d2)) if d1 * d2 < 0 =>
        b1 + (b2 - b1) * d1 / (d1 - d2) // linear root
      }
  }
}

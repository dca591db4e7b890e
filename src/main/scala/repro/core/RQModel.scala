package repro.core

import repro.compressor.Predictor

/** One ratio-quality estimate at a specific absolute error bound.
  *
  * Bit-rates cover the encoder payload (the quantity the encoder model
  * estimates, compared against the measured Huffman / Huffman+lossless
  * payloads in Table II); `estTotalBytes` additionally accounts for the
  * codebook, predictor side channel and unpredictable values, for the
  * memory-footprint use-case.
  */
final case class RQEstimate(
    eb: Double,
    p0: Double,
    huffBitRate: Double,
    llBitRate: Double,
    errVariance: Double,
    psnr: Double,
    ssim: Double,
    estTotalBytes: Long,
) {
  /** Estimated end-to-end compression ratio vs 8-byte doubles. */
  def ratio(n: Int): Double = n * 8.0 / estTotalBytes
}

/** The paper's core contribution: an analytical ratio-quality model for a
  * (field, predictor) pair. Built from a one-time 1 % prediction-error sample;
  * every subsequent estimate or inversion costs O(|sample|), never a
  * compression run.
  */
final class RQModel(val sample: PredictionErrorSample) extends Serializable {

  /** Forward estimate at absolute error bound `eb` (§III-B/-C/-E).
    *
    * The raw sampled-error histogram gets the reconstruction-feedback drift
    * correction (§III-D4 / Eq. 9, see [[Feedback]]) before feeding the
    * encoder model; the corrected central-bin share drives the
    * error-distribution mixture (Eq. 11) so the quality estimates see the
    * feedback too.
    */
  def estimate(eb: Double): RQEstimate = {
    val (hist, errVar) =
      if (sample.patches.nonEmpty) {
        // patch-simulation path (Lorenzo): short-range feedback appears
        // natively. Drift walks longer than a patch are extrapolated from
        // the in-patch variance growth γ: once γ·N exceeds e² the walk mixes
        // over the field, the error distribution reaches the confined-walk
        // stationary (~uniform, e²/3) and barrier crossings arrive at rate
        // ≈ √γ/e (coherent/correlated steps), emitting ±1 codes.
        val sim = PatchSim.simulate(sample.patches, eb)
        val gamma = sim.driftGrowthPerStep
        // coherent drift: std grows ~√γ per step, so the walk reaches the
        // barrier within the field whenever √γ·N exceeds e
        val mixes = gamma > 0 && math.sqrt(gamma) * sample.totalPoints > eb
        val rateLong =
          if (mixes) math.min(0.5, Feedback.AlphaLorenzo * math.sqrt(gamma) / eb) else 0.0
        val extra = math.max(0.0, rateLong - sim.nonZeroRate)
        val h = Feedback.applyDrift(sim.hist, extra)
        val v = if (mixes) math.max(sim.errVariance, eb * eb / 3.0) else sim.errVariance
        (h, v)
      } else {
        // analytic path (interpolation / regression): raw histogram + the
        // Eq. 9-style drift correction and Eq. 11 error mixture
        val raw = Histogram.fromErrors(sample.errors, eb)
        val rawCentralVar = ErrorDistribution.centralBinVariance(sample.errors, eb)
        val rate = Feedback.driftRate(sample.predictor, raw.p0, math.sqrt(rawCentralVar), eb)
        val h = Feedback.applyDrift(raw, rate)
        val centralVar = Feedback.centralVariance(sample.predictor, raw.p0, rawCentralVar, eb)
        (h, ErrorDistribution.mixedVariance(eb, h.p0, centralVar))
      }
    val p0 = hist.p0
    val huffB = EncoderModel.huffmanBitRate(hist)
    val llB = EncoderModel.bitRateWithLossless(hist)
    val psnrEst = QualityModel.psnr(sample.range, errVar)
    val ssimEst = QualityModel.ssim(sample.variance, sample.range, errVar)
    val bytes = estimateTotalBytes(hist, llB)
    RQEstimate(eb, p0, huffB, llB, errVar, psnrEst, ssimEst, bytes)
  }

  /** Whole-blob size estimate: payload + codebook (distinct codes scale with
    * the sample only logarithmically; good enough for the 20 % headroom
    * strategy of §IV-B) + side channel + escaped values.
    */
  private def estimateTotalBytes(hist: CodeHistogram, llBitRate: Double): Long = {
    val n = sample.totalPoints
    val payload = math.ceil(llBitRate * n / 8.0).toLong
    val codebook = repro.compressor.Huffman.codebookBytes(hist.distinct).toLong
    val escShare = hist.probabilities.getOrElse(repro.compressor.Quantizer.Escape, 0.0)
    val unpred = math.round(escShare * n) * 8L
    payload + codebook + sample.sideBytes + unpred
  }

  /** Eq. 2 (+ §III-C1 anchor interpolation for the p0 > 0.5 regime): the
    * error bound expected to deliver the target encoder bit-rate.
    *
    * @param targetB     target bits/point
    * @param withLossless whether the lossless stage is on (then the
    *                     RLE-regime inversion Eq. 8 matters below ~1 bit)
    */
  def errorBoundForBitRate(targetB: Double, withLossless: Boolean = true): Double = {
    require(targetB > 0, "target bit-rate must be positive")
    def bitRate(e: Double): Double = {
      val est = estimate(e)
      if (withLossless) est.llBitRate else est.huffBitRate
    }
    // Profile at the p0 = 0.5 anchor: Eq. 3's approximation holds above it.
    val e50 = math.max(sample.absQuantile(0.5), tinyEb)
    val b50 = bitRate(e50)
    if (targetB >= b50) {
      // Low-error-bound regime: Eq. 2, e* = 2^(B−B*)·e, once + one refinement.
      val e1 = clampEb(e50 * math.pow(2.0, b50 - targetB))
      val b1 = bitRate(e1)
      clampEb(e1 * math.pow(2.0, b1 - targetB))
    } else {
      // High-error-bound regime: interpolate over the p0 anchors (§III-C1).
      val anchors = Seq(0.5, 0.8, 0.95, 0.99).map { p =>
        val e = math.max(sample.absQuantile(p), tinyEb)
        (e, bitRate(e))
      }
      interpolateEb(anchors, targetB)
    }
  }

  /** Error bound expected to deliver a target PSNR: closed form from Eq. 12
    * under the uniform distribution, then a short bisection on the mixed
    * model (Eq. 11) — still sample-only, no compression.
    */
  def errorBoundForPsnr(targetPsnr: Double): Double = {
    val targetVar = QualityModel.errVarianceForPsnr(sample.range, targetPsnr)
    var lo = clampEb(math.sqrt(3 * targetVar) / 64)
    var hi = clampEb(math.sqrt(3 * targetVar) * 64)
    var i = 0
    while (i < 40) {
      val mid = math.sqrt(lo * hi)
      if (estimate(mid).errVariance > targetVar) hi = mid else lo = mid
      i += 1
    }
    math.sqrt(lo * hi)
  }

  private def tinyEb: Double = math.max(sample.range * 1e-12, Double.MinPositiveValue)

  private def clampEb(e: Double): Double =
    math.min(math.max(e, tinyEb), math.max(sample.range, tinyEb) * 10)

  /** Piecewise log-linear interpolation of e(B) over (e, B) anchor pairs. */
  private def interpolateEb(anchors: Seq[(Double, Double)], targetB: Double): Double = {
    // B decreases with e; sort by B ascending.
    val pts = anchors.sortBy(_._2)
    if (targetB <= pts.head._2) {
      // beyond the largest profiled error bound: extrapolate the last segment
      val Seq((e1, b1), (e2, b2)) = pts.take(2).toSeq
      return clampEb(extrapolate(e1, b1, e2, b2, targetB))
    }
    if (targetB >= pts.last._2) return pts.last._1
    val i = pts.lastIndexWhere(_._2 <= targetB)
    val (eLo, bLo) = pts(i)
    val (eHi, bHi) = pts(i + 1)
    clampEb(extrapolate(eLo, bLo, eHi, bHi, targetB))
  }

  private def extrapolate(e1: Double, b1: Double, e2: Double, b2: Double, targetB: Double): Double = {
    if (math.abs(b2 - b1) < 1e-12) return math.sqrt(e1 * e2)
    val t = (targetB - b1) / (b2 - b1)
    math.exp(math.log(e1) + t * (math.log(e2) - math.log(e1)))
  }
}

object RQModel {

  /** Build the model for a field and predictor: the one-time sampling pass. */
  def build(field: Field, predictor: Predictor, rate: Double = Sampler.DefaultRate, seed: Long = 42L): RQModel =
    new RQModel(Sampler.sample(field, predictor, rate, seed))

  /** The paper's accuracy metric (Eq. 20): E = 1 − (1 + STD(R/R' − 1))⁻¹
    * over paired (measured R, estimated R') values. Returned as the *error*
    * (Table II reports this as a percentage).
    */
  def accuracyError(measured: Seq[Double], estimated: Seq[Double]): Double = {
    require(measured.length == estimated.length && measured.nonEmpty, "paired, non-empty series required")
    val ratios = measured.zip(estimated).collect { case (m, e) if e != 0 && !m.isInfinite && !e.isInfinite => m / e - 1.0 }
    if (ratios.isEmpty) return 0.0
    val mu = ratios.sum / ratios.length
    val std = math.sqrt(ratios.map(r => (r - mu) * (r - mu)).sum / ratios.length)
    1.0 - 1.0 / (1.0 + std)
  }

  /** Eq. 20 on bit-rate-like series whose values can degenerate to ~0 (the
    * lossless stage on ultra-smooth data): both sides are floored at
    * `floor` bits/point before the ratio — below that the footprint is
    * negligible either way and the ratio of near-zeros is meaningless.
    */
  def accuracyErrorFloored(measured: Seq[Double], estimated: Seq[Double], floor: Double = 0.05): Double =
    accuracyError(measured.map(math.max(_, floor)), estimated.map(math.max(_, floor)))
}

package repro.core

/** Post-hoc analysis quality model (§III-E): PSNR (Eqs. 12–14) and SSIM
  * (Eqs. 15–19) by propagating the estimated compression-error distribution
  * through each metric. The FFT/power-spectrum example lives in
  * [[repro.analysis.Fft.estimateSpectrumDegradation]].
  */
object QualityModel {

  /** Eq. 12: PSNR(D', D) = 20·log₁₀(range) − 10·log₁₀(σ(E)²). */
  def psnr(range: Double, errVariance: Double): Double = {
    if (errVariance <= 0) Double.PositiveInfinity
    else 20 * math.log10(range) - 10 * math.log10(errVariance)
  }

  /** Inverse of Eq. 12: the error variance corresponding to a target PSNR. */
  def errVarianceForPsnr(range: Double, targetPsnr: Double): Double =
    math.pow(range, 2) / math.pow(10, targetPsnr / 10.0)

  /** Eq. 15: SSIM(D', D) ≈ (2σ_D² + C3) / (2σ_D² + C3 + σ(E)²), with the
    * standard stabilizer C3 = (0.03·range)² (same constant the measured
    * global SSIM uses).
    */
  def ssim(fieldVariance: Double, range: Double, errVariance: Double): Double = {
    val c3 = math.pow(0.03 * range, 2)
    (2 * fieldVariance + c3) / (2 * fieldVariance + c3 + errVariance)
  }
}

package repro.compressor

/** Linear-scaling quantizer (SZ-style, §III-B of the paper).
  *
  * The prediction error `actual - pred` is quantized to an integer code with
  * interval size `2*eb`, so the reconstructed value `pred + code*2*eb` is
  * always within `eb` of the actual value. Codes whose magnitude reaches
  * `radius` escape to "unpredictable": the raw value is stored verbatim
  * (lossless for that point) — exactly SZ's out-of-range handling.
  *
  * @param eb     absolute error bound (must be > 0)
  * @param radius escape threshold; SZ default quantization bins = 2*radius
  */
final class Quantizer(val eb: Double, val radius: Int = 32768) {
  require(eb > 0, "error bound must be positive")
  require(radius > 1, "radius must be > 1")

  val interval: Double = 2.0 * eb

  /** Quantize one prediction. Returns the code (or [[Quantizer.Escape]]) and
    * the reconstructed value. The error-bound invariant holds for every
    * non-escape code; escapes reconstruct exactly.
    */
  def quantize(pred: Double, actual: Double): (Int, Double) = {
    val diff = actual - pred
    val code = math.rint(diff / interval)
    if (code.isNaN || math.abs(code) >= radius) (Quantizer.Escape, actual)
    else {
      val c = code.toInt
      val recon = pred + c * interval
      // Floating-point cancellation can nudge |recon-actual| past eb for
      // values many orders of magnitude above eb; escape those too. The
      // 1e-10 slack tolerates exact half-interval rounding wobble.
      if (math.abs(recon - actual) > eb * (1 + 1e-10)) (Quantizer.Escape, actual)
      else (c, recon)
    }
  }

  /** Reconstruct from a (non-escape) code. */
  def reconstruct(pred: Double, code: Int): Double = pred + code * interval
}

object Quantizer {
  /** Sentinel code marking an unpredictable (verbatim-stored) point. */
  val Escape: Int = Int.MinValue
}

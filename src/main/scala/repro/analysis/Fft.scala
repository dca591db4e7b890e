package repro.analysis

import repro.core.Field

/** Iterative radix-2 complex FFT plus the power-spectrum degradation metric
  * used as the paper's data-specific post-hoc analysis example (Nyx, §III-E4,
  * Fig. 8).
  */
object Fft {

  /** In-place iterative radix-2 Cooley–Tukey FFT. Lengths must be powers of 2. */
  def fft(re: Array[Double], im: Array[Double]): Unit = {
    val n = re.length
    require(n == im.length && (n & (n - 1)) == 0, "length must be a power of two")
    // bit reversal
    var j = 0
    var i = 1
    while (i < n) {
      var bit = n >> 1
      while ((j & bit) != 0) { j ^= bit; bit >>= 1 }
      j |= bit
      if (i < j) {
        val tr = re(i); re(i) = re(j); re(j) = tr
        val ti = im(i); im(i) = im(j); im(j) = ti
      }
      i += 1
    }
    var len = 2
    while (len <= n) {
      val ang = -2 * math.Pi / len
      val wr = math.cos(ang); val wi = math.sin(ang)
      var base = 0
      while (base < n) {
        var cr = 1.0; var ci = 0.0
        var k = 0
        while (k < len / 2) {
          val ur = re(base + k); val ui = im(base + k)
          val vr0 = re(base + k + len / 2); val vi0 = im(base + k + len / 2)
          val vr = vr0 * cr - vi0 * ci
          val vi = vr0 * ci + vi0 * cr
          re(base + k) = ur + vr; im(base + k) = ui + vi
          re(base + k + len / 2) = ur - vr; im(base + k + len / 2) = ui - vi
          val ncr = cr * wr - ci * wi
          ci = cr * wi + ci * wr
          cr = ncr
          k += 1
        }
        base += len
      }
      len <<= 1
    }
  }

  /** Power spectrum |F(k)|² of the flattened field, zero-padded to the next
    * power of two, mean removed (scientific power spectra ignore the DC bulk).
    * Returns the first half (non-redundant frequencies).
    */
  def powerSpectrum(field: Field): Array[Double] = {
    val n0 = field.size
    var n = 1
    while (n < n0) n <<= 1
    val re = new Array[Double](n)
    val im = new Array[Double](n)
    val mu = field.mean
    var i = 0
    while (i < n0) { re(i) = field.data(i) - mu; i += 1 }
    fft(re, im)
    val half = n / 2
    val out = new Array[Double](half)
    i = 0
    while (i < half) { out(i) = re(i) * re(i) + im(i) * im(i); i += 1 }
    out
  }

  /** Measured spectrum degradation: mean relative error of the binned power
    * spectrum of the reconstructed vs original field over the `frac` lowest
    * (highest-power) frequencies — the band a Nyx-style analysis cares about.
    */
  def spectrumDegradation(orig: Field, recon: Field, frac: Double = 0.25): Double = {
    val po = powerSpectrum(orig)
    val pr = powerSpectrum(recon)
    val k = math.max(1, (po.length * frac).toInt)
    var s = 0.0
    var cnt = 0
    var i = 1 // skip DC
    while (i < k) {
      if (po(i) > 0) { s += math.abs(pr(i) - po(i)) / po(i); cnt += 1 }
      i += 1
    }
    if (cnt == 0) 0.0 else s / cnt
  }

  /** Model-side estimate of the same metric: white compression noise of
    * variance σ² adds an expected N·σ² to every |F(k)|² bin (Parseval), so the
    * expected relative degradation of bin k is N·σ²/P(k). We average over the
    * same band using the *original* spectrum — i.e., error propagation with
    * the estimated error distribution, no decompression needed.
    */
  def estimateSpectrumDegradation(orig: Field, noiseVariance: Double, frac: Double = 0.25): Double = {
    val po = powerSpectrum(orig)
    // the padded FFT length determines the noise power per bin
    var n = 1
    while (n < orig.size) n <<= 1
    val addedPower = orig.size.toDouble * noiseVariance // only n0 samples carry noise
    val k = math.max(1, (po.length * frac).toInt)
    var s = 0.0
    var cnt = 0
    var i = 1
    while (i < k) {
      if (po(i) > 0) { s += addedPower / po(i); cnt += 1 }
      i += 1
    }
    if (cnt == 0) 0.0 else s / cnt
  }
}

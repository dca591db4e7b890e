package repro.analysis

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Field

class FftSpec extends AnyFunSuite {

  private def naiveDft(x: Array[Double]): (Array[Double], Array[Double]) = {
    val n = x.length
    val re = new Array[Double](n)
    val im = new Array[Double](n)
    for (k <- 0 until n; t <- 0 until n) {
      val ang = -2 * math.Pi * k * t / n
      re(k) += x(t) * math.cos(ang)
      im(k) += x(t) * math.sin(ang)
    }
    (re, im)
  }

  test("fft matches naive DFT on random input") {
    val rnd = new java.util.Random(32)
    val x = Array.fill(64)(rnd.nextGaussian())
    val re = x.clone(); val im = new Array[Double](64)
    Fft.fft(re, im)
    val (er, ei) = naiveDft(x)
    (0 until 64).foreach { k =>
      assert(math.abs(re(k) - er(k)) < 1e-8, s"re[$k]")
      assert(math.abs(im(k) - ei(k)) < 1e-8, s"im[$k]")
    }
  }

  test("fft of a pure sinusoid concentrates power at its frequency") {
    val n = 256
    val x = Array.tabulate(n)(i => math.sin(2 * math.Pi * 8 * i / n))
    val re = x.clone(); val im = new Array[Double](n)
    Fft.fft(re, im)
    val power = (0 until n / 2).map(k => re(k) * re(k) + im(k) * im(k))
    assert(power.indexOf(power.max) == 8)
  }

  test("Parseval: time-domain energy equals frequency-domain energy / n") {
    val rnd = new java.util.Random(33)
    val n = 128
    val x = Array.fill(n)(rnd.nextGaussian())
    val re = x.clone(); val im = new Array[Double](n)
    Fft.fft(re, im)
    val timeE = x.map(v => v * v).sum
    val freqE = (0 until n).map(k => re(k) * re(k) + im(k) * im(k)).sum / n
    assert(math.abs(timeE - freqE) < 1e-8 * timeE)
  }

  test("fft rejects non-power-of-two lengths") {
    intercept[IllegalArgumentException](Fft.fft(new Array[Double](12), new Array[Double](12)))
  }

  test("powerSpectrum removes the mean (DC ~ 0)") {
    val f = Field.of1d(Array.fill(64)(5.0))
    val ps = Fft.powerSpectrum(f)
    assert(ps.forall(_ < 1e-18))
  }

  test("spectrumDegradation is 0 for identical fields") {
    val f = Field.of1d(Array.tabulate(256)(i => math.sin(i * 0.1)))
    assert(Fft.spectrumDegradation(f, f) == 0.0)
  }

  test("spectrumDegradation grows with injected noise") {
    val rnd = new java.util.Random(34)
    val f = Field.of1d(Array.tabulate(1024)(i => math.sin(i * 0.05) * 10))
    val ds = Seq(0.01, 0.1, 1.0).map { amp =>
      val r2 = new java.util.Random(35)
      val noisy = Field.of1d(f.data.map(v => v + (r2.nextDouble() * 2 - 1) * amp))
      Fft.spectrumDegradation(f, noisy)
    }
    assert(ds == ds.sorted)
  }

  test("estimateSpectrumDegradation tracks measured degradation for white noise") {
    val rnd = new java.util.Random(36)
    val f = Field.of1d(Array.tabulate(4096)(i =>
      math.sin(i * 0.01) * 5 + math.sin(i * 0.11) * 2 + rnd.nextGaussian() * 0.2))
    val e = 0.5
    val r2 = new java.util.Random(37)
    val noisy = Field.of1d(f.data.map(v => v + (r2.nextDouble() * 2 - 1) * e))
    val meas = Fft.spectrumDegradation(f, noisy)
    val est = Fft.estimateSpectrumDegradation(f, ErrorDist.uniformVariance(e))
    // same order of magnitude (the measured value is a single noise draw)
    assert(est > meas / 4 && est < meas * 4, s"meas=$meas est=$est")
  }

  private object ErrorDist {
    def uniformVariance(e: Double): Double = e * e / 3
  }
}

package repro.compressor

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Field

class CompressorSpec extends AnyFunSuite {

  private def smooth3d(seed: Long = 1): Field = {
    val dims = Array(16, 20, 24)
    Field.tabulate(dims) { i =>
      val f = Field(new Array[Double](dims.product), dims)
      val c = f.coords(i)
      math.sin(c(0) * 0.3) * math.cos(c(1) * 0.2) + 0.1 * c(2)
    }
  }

  for (p <- Predictor.all) {
    test("blob roundtrip matches in-memory reconstruction (" + p.name + ")") {
      val f = smooth3d()
      val eb = 1e-3
      val res = Compressor.compress(f, eb, p)
      val blob = Compressor.compressToBlob(f, eb, p)
      val dec = Compressor.decompressBlob(blob)
      assert(dec.dims.toSeq == f.dims.toSeq)
      assert(dec.data.toSeq == res.recon.data.toSeq)
      assert(Compressor.maxAbsError(f, dec) <= eb * (1 + 1e-9))
    }

    test("smooth data compresses with ratio > 4 (" + p.name + ")") {
      val f = smooth3d()
      val res = Compressor.compress(f, 1e-3 * f.valueRange, p)
      assert(res.ratioHuff > 4.0, s"ratio=${res.ratioHuff}")
    }

    test("bit-rate decreases as error bound grows (" + p.name + ")") {
      val f = smooth3d()
      val rates = Seq(1e-5, 1e-4, 1e-3, 1e-2).map { r =>
        Compressor.compress(f, r * f.valueRange, p).huffBitRate
      }
      assert(rates == rates.sorted.reverse, rates.toString)
    }

    test("p0 increases with error bound (" + p.name + ")") {
      val f = smooth3d()
      val p0s = Seq(1e-5, 1e-3, 1e-1).map(r => Compressor.compress(f, r * f.valueRange, p).p0)
      assert(p0s == p0s.sorted, p0s.toString)
    }
  }

  test("sizes: huffBytes accounts payload + codebook + side + unpredictables") {
    val f = smooth3d()
    val res = Compressor.compress(f, 1e-3, LorenzoPredictor)
    val expect = (res.huffPayloadBits + 7) / 8 + res.codebookBytes + res.sideBytes + res.unpredCount * 8L
    assert(res.huffBytes == expect)
  }

  test("blob size is close to huffBytes accounting") {
    val f = smooth3d()
    val res = Compressor.compress(f, 1e-3, LorenzoPredictor)
    val blob = Compressor.compressToBlob(f, 1e-3, LorenzoPredictor)
    // blob adds a fixed header (< 64 B) on top of the accounted size
    assert(math.abs(blob.length - res.huffBytes) < 64)
  }

  /** Brownian data: Lorenzo's 1-D delta decorrelates it fully, so large
    * error bounds give the genuinely zero-dominated regime (Fig. 3's right
    * side) that the lossless stage exploits.
    */
  private def brownian(n: Int = 32768, seed: Long = 13): Field = {
    val rnd = new java.util.Random(seed)
    var acc = 0.0
    Field.of1d(Array.fill(n) { acc += rnd.nextGaussian(); acc })
  }

  test("losslessGain ~1 at low error bound, > 2 at high error bound") {
    val f = brownian()
    val lo = Compressor.compress(f, 1e-6 * f.valueRange, LorenzoPredictor)
    val hi = Compressor.compress(f, 5e-2 * f.valueRange, LorenzoPredictor)
    assert(lo.losslessGain < 1.6, s"low-eb gain ${lo.losslessGain}")
    assert(hi.losslessGain > 2.0, s"high-eb gain ${hi.losslessGain}")
  }

  test("rleBits tracks deflate behaviour in the zero-dominated regime") {
    val f = brownian()
    val res = Compressor.compress(f, 5e-2 * f.valueRange, LorenzoPredictor)
    assert(res.p0 > 0.9)
    val rleGain = res.huffPayloadBits.toDouble / res.rleBits
    // both capture the zero-run redundancy; they should agree within 2x
    assert(rleGain > res.losslessGain / 2 && rleGain < res.losslessGain * 2,
      s"rleGain=$rleGain deflateGain=${res.losslessGain}")
  }

  test("compression of constant field is extremely compact") {
    val f = Field.of1d(Array.fill(10000)(3.14))
    val res = Compressor.compress(f, 1e-6, LorenzoPredictor)
    assert(res.ratioHuffLL > 50)
    assert(Compressor.maxAbsError(f, res.recon) <= 1e-6)
  }

  test("1-D Brownian data: error bound holds and ratio is moderate") {
    val rnd = new java.util.Random(13)
    var acc = 0.0
    val f = Field.of1d(Array.fill(20000) { acc += rnd.nextGaussian(); acc })
    val eb = 1e-3 * f.valueRange
    Predictor.all.foreach { p =>
      val res = Compressor.compress(f, eb, p)
      assert(Compressor.maxAbsError(f, res.recon) <= eb * (1 + 1e-9), p.name)
      assert(res.ratioHuff > 1.5, s"${p.name}: ${res.ratioHuff}")
    }
  }

  test("escape-heavy field still satisfies the bound end to end") {
    val rnd = new java.util.Random(14)
    val f = Field.of1d(Array.fill(3000)(rnd.nextDouble() * 1e12))
    val eb = 1e-9
    val res = Compressor.compress(f, eb, LorenzoPredictor)
    assert(res.unpredCount > 0)
    assert(Compressor.maxAbsError(f, res.recon) <= eb * (1 + 1e-9))
    val blob = Compressor.compressToBlob(f, eb, LorenzoPredictor)
    assert(Compressor.decompressBlob(blob).data.toSeq == res.recon.data.toSeq)
  }
}

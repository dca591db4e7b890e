package repro.compressor

import org.scalatest.funsuite.AnyFunSuite

class RleSpec extends AnyFunSuite {

  test("token roundtrip: all zeros") {
    val codes = Array.fill(1000)(0)
    assert(Rle.decodeTokens(Rle.encodeTokens(codes)).toSeq == codes.toSeq)
  }

  test("token roundtrip: no zeros") {
    val codes = Array(1, -1, 2, 5, -3)
    assert(Rle.decodeTokens(Rle.encodeTokens(codes)).toSeq == codes.toSeq)
  }

  test("token roundtrip: mixed stream") {
    val rnd = new java.util.Random(8)
    val codes = Array.fill(5000)(if (rnd.nextDouble() < 0.9) 0 else rnd.nextInt(9) - 4)
    assert(Rle.decodeTokens(Rle.encodeTokens(codes)).toSeq == codes.toSeq)
  }

  test("token roundtrip: run longer than MaxRun splits correctly") {
    val codes = Array.fill(Rle.MaxRun * 3 + 17)(0)
    val tokens = Rle.encodeTokens(codes)
    assert(Rle.decodeTokens(tokens).toSeq == codes.toSeq)
    assert(tokens.length == 8) // 4 (marker, len) pairs
  }

  test("empty input") {
    assert(Rle.encodeTokens(Array.empty[Int]).isEmpty)
    assert(Rle.decodeTokens(Array.empty[Int]).isEmpty)
  }

  test("bitsAfterZeroRunRle: pure zeros cost RunLengthBits per run") {
    val codes = Array.fill(100)(0) // single run (< MaxRun)
    val bits = Rle.bitsAfterZeroRunRle(codes, Map(0 -> 1))
    assert(bits == Rle.RunLengthBits)
  }

  test("bitsAfterZeroRunRle: non-zeros cost their Huffman length") {
    val codes = Array(1, 2, 1)
    val bits = Rle.bitsAfterZeroRunRle(codes, Map(1 -> 2, 2 -> 3))
    assert(bits == 7)
  }

  test("bitsAfterZeroRunRle beats plain Huffman when zeros dominate") {
    val rnd = new java.util.Random(9)
    val codes = Array.fill(10000)(if (rnd.nextDouble() < 0.98) 0 else 1)
    val freqs = codes.groupBy(identity).map { case (s, a) => s -> a.length.toLong }
    val lens = Huffman.codeLengths(freqs)
    val plain = freqs.map { case (s, f) => f * lens(s) }.sum
    assert(Rle.bitsAfterZeroRunRle(codes, lens) < plain)
  }

  test("bitsAfterZeroRunRle matches expectation for alternating stream") {
    // 0,x,0,x...: each zero is a run of 1 costing 8 bits; worse than Huffman
    val codes = Array.tabulate(100)(i => if (i % 2 == 0) 0 else 1)
    val bits = Rle.bitsAfterZeroRunRle(codes, Map(0 -> 1, 1 -> 1))
    assert(bits == 50 * Rle.RunLengthBits + 50)
  }

  test("RunMarker cannot collide with quantization codes") {
    assert(Rle.RunMarker > 32768 * 2)
  }
}

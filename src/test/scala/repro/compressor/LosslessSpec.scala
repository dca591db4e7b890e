package repro.compressor

import org.scalatest.funsuite.AnyFunSuite

class LosslessSpec extends AnyFunSuite {

  test("roundtrip random bytes") {
    val rnd = new java.util.Random(10)
    val data = new Array[Byte](10000)
    rnd.nextBytes(data)
    assert(Lossless.decompress(Lossless.compress(data)).toSeq == data.toSeq)
  }

  test("roundtrip empty input") {
    assert(Lossless.decompress(Lossless.compress(Array.empty[Byte])).isEmpty)
  }

  test("roundtrip highly redundant input compresses well") {
    val data = Array.fill[Byte](100000)(0)
    val c = Lossless.compress(data)
    assert(c.length < data.length / 50)
    assert(Lossless.decompress(c).toSeq == data.toSeq)
  }

  test("random data does not blow up much") {
    val rnd = new java.util.Random(11)
    val data = new Array[Byte](50000)
    rnd.nextBytes(data)
    assert(Lossless.compress(data).length <= data.length + 1024)
  }

  test("roundtrip structured runs") {
    val data = (0 until 1000).flatMap(i => Array.fill[Byte](i % 7 + 1)((i % 3).toByte)).toArray
    assert(Lossless.decompress(Lossless.compress(data)).toSeq == data.toSeq)
  }
}

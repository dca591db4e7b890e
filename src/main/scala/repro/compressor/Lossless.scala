package repro.compressor

import java.util.zip.{Deflater, Inflater}
import scala.collection.mutable.ArrayBuffer

/** Dictionary-style lossless stage applied after Huffman.
  *
  * Stand-in for the paper's Zstandard/Gzip stage (Fig. 3): Deflate is the
  * Gzip codec (LZ77 + Huffman), available in the JDK, so the measured
  * "Huffman + lossless" sizes exercise the same redundancy the paper's
  * RLE-based model (Eqs. 4–8) captures — runs of the dominant zero code.
  */
object Lossless {

  def compress(data: Array[Byte], level: Int = Deflater.DEFAULT_COMPRESSION): Array[Byte] = {
    val d = new Deflater(level)
    d.setInput(data)
    d.finish()
    val out = new ArrayBuffer[Byte](data.length / 2 + 64)
    val buf = new Array[Byte](64 * 1024)
    while (!d.finished()) {
      val n = d.deflate(buf)
      out ++= buf.take(n)
    }
    d.end()
    out.toArray
  }

  def decompress(data: Array[Byte]): Array[Byte] = {
    val inf = new Inflater()
    inf.setInput(data)
    val out = new ArrayBuffer[Byte](data.length * 4 + 64)
    val buf = new Array[Byte](64 * 1024)
    var done = inf.finished()
    while (!done) {
      val n = inf.inflate(buf)
      if (n > 0) out ++= buf.take(n)
      else if (inf.finished() || inf.needsDictionary()) done = true
      else if (inf.needsInput()) throw new IllegalArgumentException("truncated deflate stream")
    }
    inf.end()
    out.toArray
  }
}

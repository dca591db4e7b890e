package repro.compressor

import repro.core.Field

/** Measured result of one compression run.
  *
  * Sizes are split so the model's per-stage estimates (Huffman vs lossless)
  * can be compared against the matching measured quantity, as in Table II.
  *
  * @param predictor      predictor name
  * @param eb             absolute error bound used
  * @param n              number of data points
  * @param huffPayloadBits exact Huffman payload bits over the quantization codes
  * @param codebookBytes  serialized Huffman codebook size
  * @param sideBytes      predictor side channel (anchors / regression coeffs)
  * @param unpredCount    escape-coded points (stored verbatim, 8 B each)
  * @param huffLLBytes    Huffman blob further compressed by the lossless stage
  * @param rleBits        Huffman payload bits after zero-run RLE (measured Eq. 4 counterpart)
  * @param p0             fraction of zero quantization codes
  * @param recon          reconstructed field (decompressor output)
  */
final case class CompressionResult(
    predictor: String,
    eb: Double,
    n: Int,
    huffPayloadBits: Long,
    codebookBytes: Int,
    sideBytes: Int,
    unpredCount: Int,
    huffLLBytes: Long,
    rleBits: Long,
    p0: Double,
    recon: Field,
) {
  private def overheadBytes: Long = codebookBytes.toLong + sideBytes + unpredCount.toLong * 8

  /** Compressed size with Huffman only (bytes). */
  def huffBytes: Long = (huffPayloadBits + 7) / 8 + overheadBytes

  /** Compressed size with Huffman + lossless stage (bytes). */
  def huffPlusLLBytes: Long = huffLLBytes + overheadBytes

  /** Compressed size with Huffman + zero-run RLE (bytes). */
  def huffPlusRleBytes: Long = (rleBits + 7) / 8 + overheadBytes

  /** Bit-rate (bits/point) of the Huffman payload alone — the quantity the
    * Huffman model (Eq. 1) estimates. */
  def huffBitRate: Double = huffPayloadBits.toDouble / n

  /** Bit-rate including lossless stage payload (no fixed overheads). */
  def huffLLBitRate: Double = huffLLBytes * 8.0 / n

  /** Extra ratio provided by the lossless stage (≥ ~1). */
  def losslessGain: Double = huffPayloadBits.toDouble / 8.0 / huffLLBytes

  /** End-to-end compression ratio vs 8-byte doubles, Huffman only. */
  def ratioHuff: Double = n * 8.0 / huffBytes

  /** End-to-end compression ratio vs 8-byte doubles, with lossless stage. */
  def ratioHuffLL: Double = n * 8.0 / huffPlusLLBytes
}

/** End-to-end prediction-based error-bounded lossy compressor: the substrate
  * the ratio-quality model (repro.core) is validated against. Mirrors SZ3's
  * pipeline: predictor → linear-scaling quantizer → Huffman → optional
  * lossless (Deflate), plus a full decompressor for roundtrip verification.
  */
object Compressor {

  /** Compress and measure. The reconstruction in the result is byte-identical
    * to what [[decompressBlob]] yields from [[compressToBlob]].
    */
  def compress(field: Field, ebAbs: Double, predictor: Predictor): CompressionResult = {
    val quant = new Quantizer(ebAbs)
    val out = predictor.compress(field, quant)
    val freqs = {
      val m = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
      out.codes.foreach(c => m(c) += 1)
      m.toMap
    }
    val lens = Huffman.codeLengths(freqs)
    val huffBits = freqs.iterator.map { case (s, f) => f * lens(s) }.sum
    val blob = Huffman.encode(out.codes)
    // the lossless stage sees the Huffman *payload*; the codebook is fixed
    // metadata accounted separately (as the model does)
    val payload = java.util.Arrays.copyOfRange(blob, Huffman.codebookBytes(freqs.size), blob.length)
    val ll = Lossless.compress(payload)
    val rleBits = Rle.bitsAfterZeroRunRle(out.codes, lens)
    val zeros = freqs.getOrElse(0, 0L)
    CompressionResult(
      predictor = predictor.name,
      eb = ebAbs,
      n = field.size,
      huffPayloadBits = huffBits,
      codebookBytes = Huffman.codebookBytes(freqs.size),
      sideBytes = out.sideBytes,
      unpredCount = out.unpredictable.length,
      huffLLBytes = ll.length.toLong,
      rleBits = rleBits,
      p0 = zeros.toDouble / math.max(1, out.codes.length),
      recon = out.recon,
    )
  }

  /** Serialize a full self-describing compressed blob (used to prove the
    * pipeline actually roundtrips; size accounting in tests checks it against
    * [[CompressionResult.huffBytes]]).
    *
    * Layout: [ndim][dims...][eb][predictorId][unpredCount][unpred...][sideLen][side][huffBlob]
    */
  def compressToBlob(field: Field, ebAbs: Double, predictor: Predictor): Array[Byte] = {
    val quant = new Quantizer(ebAbs)
    val out = predictor.compress(field, quant)
    val huff = Huffman.encode(out.codes)
    val bb = java.nio.ByteBuffer.allocate(
      4 + 4 * field.ndim + 8 + 4 + 4 + 8 * out.unpredictable.length + 4 + out.side.length + huff.length)
    bb.putInt(field.ndim)
    field.dims.foreach(bb.putInt)
    bb.putDouble(ebAbs)
    bb.putInt(Predictor.idOf(predictor))
    bb.putInt(out.unpredictable.length)
    out.unpredictable.foreach(bb.putDouble)
    bb.putInt(out.side.length)
    bb.put(out.side)
    bb.put(huff)
    bb.array()
  }

  /** Decompress a blob produced by [[compressToBlob]]. */
  def decompressBlob(blob: Array[Byte]): Field = {
    val bb = java.nio.ByteBuffer.wrap(blob)
    val ndim = bb.getInt
    val dims = Array.fill(ndim)(bb.getInt)
    val eb = bb.getDouble
    val predictor = Predictor.byId(bb.getInt)
    val nUnpred = bb.getInt
    val unpred = Array.fill(nUnpred)(bb.getDouble)
    val sideLen = bb.getInt
    val side = new Array[Byte](sideLen)
    bb.get(side)
    val huff = new Array[Byte](blob.length - bb.position())
    bb.get(huff)
    val codes = Huffman.decode(huff)
    predictor.decompress(dims, new Quantizer(eb), codes, unpred, side)
  }

  /** Verify the error-bound invariant; returns the max abs error. */
  def maxAbsError(a: Field, b: Field): Double = {
    var m = 0.0
    var i = 0
    while (i < a.size) {
      val d = math.abs(a.data(i) - b.data(i))
      if (d > m) m = d
      i += 1
    }
    m
  }
}

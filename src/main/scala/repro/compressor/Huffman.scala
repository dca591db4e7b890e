package repro.compressor

import scala.collection.mutable

/** Real Huffman codec over Int symbols (quantization codes).
  *
  * Builds the optimal prefix code from symbol frequencies, encodes to a bit
  * stream, and serializes a canonical codebook so `decode` is self-contained.
  * `encodedBits` exposes the exact payload size for measurement without
  * materializing the stream (same lengths the encoder uses).
  */
object Huffman {

  /** symbol -> code length (bits) of the optimal prefix code.
    * Single-symbol alphabets get length 1 (a real stream needs ≥1 bit/symbol).
    */
  def codeLengths(freqs: Map[Int, Long]): Map[Int, Int] = {
    require(freqs.nonEmpty, "empty alphabet")
    require(freqs.valuesIterator.forall(_ > 0), "frequencies must be positive")
    if (freqs.size == 1) return Map(freqs.head._1 -> 1)

    // Standard two-queue-free approach: priority queue of (weight, node).
    final case class Node(weight: Long, symbols: List[Int])
    val pq = mutable.PriorityQueue.empty[Node](Ordering.by[Node, Long](_.weight).reverse)
    freqs.foreach { case (s, f) => pq.enqueue(Node(f, List(s))) }
    val depth = mutable.Map.empty[Int, Int].withDefaultValue(0)
    while (pq.size > 1) {
      val a = pq.dequeue(); val b = pq.dequeue()
      (a.symbols ++ b.symbols).foreach(s => depth(s) += 1)
      pq.enqueue(Node(a.weight + b.weight, a.symbols ++ b.symbols))
    }
    freqs.keysIterator.map(s => s -> depth(s)).toMap
  }

  /** Exact total payload bits for the given frequencies (no codebook). */
  def encodedBits(freqs: Map[Int, Long]): Long = {
    val lens = codeLengths(freqs)
    freqs.iterator.map { case (s, f) => f * lens(s) }.sum
  }

  /** Canonical codes (symbol -> (code, len)) from code lengths:
    * sort by (len, symbol), assign increasing code values.
    */
  def canonicalCodes(lengths: Map[Int, Int]): Map[Int, (Int, Int)] = {
    val sorted = lengths.toSeq.sortBy { case (s, l) => (l, s) }
    var code = 0
    var prevLen = 0
    sorted.map { case (s, l) =>
      code <<= (l - prevLen)
      prevLen = l
      val out = s -> (code, l)
      code += 1
      out
    }.toMap
  }

  /** Encoded blob: [numSymbols:int][symbol:int, len:byte]* [numCodes:int][payloadBits:long][payload bytes]. */
  def encode(symbols: Array[Int]): Array[Byte] = {
    val freqs = mutable.Map.empty[Int, Long].withDefaultValue(0L)
    symbols.foreach(s => freqs(s) += 1)
    val lens = codeLengths(freqs.toMap)
    val codes = canonicalCodes(lens)

    val payloadBits = symbols.iterator.map(s => codes(s)._2.toLong).sum
    val headerBytes = 4 + lens.size * 5 + 4 + 8
    val out = java.nio.ByteBuffer.allocate(headerBytes + ((payloadBits + 7) / 8).toInt)
    out.putInt(lens.size)
    lens.toSeq.sortBy { case (s, l) => (l, s) }.foreach { case (s, l) => out.putInt(s); out.put(l.toByte) }
    out.putInt(symbols.length)
    out.putLong(payloadBits)

    var acc = 0L
    var nbits = 0
    symbols.foreach { s =>
      val (c, l) = codes(s)
      acc = (acc << l) | (c.toLong & ((1L << l) - 1))
      nbits += l
      while (nbits >= 8) {
        out.put(((acc >>> (nbits - 8)) & 0xff).toByte)
        nbits -= 8
      }
    }
    if (nbits > 0) out.put(((acc << (8 - nbits)) & 0xff).toByte)
    out.array()
  }

  /** Decode a blob produced by [[encode]]. */
  def decode(blob: Array[Byte]): Array[Int] = {
    val bb = java.nio.ByteBuffer.wrap(blob)
    val nsym = bb.getInt
    val lens = (0 until nsym).map(_ => { val s = bb.getInt; val l = bb.get.toInt; (s, l) })
    val ncodes = bb.getInt
    val payloadBits = bb.getLong
    val codes = canonicalCodes(lens.toMap)
    // decoding table: (len, code) -> symbol
    val byLenCode = codes.map { case (s, (c, l)) => (l, c) -> s }
    val maxLen = if (lens.isEmpty) 0 else lens.map(_._2).max

    val out = new Array[Int](ncodes)
    var produced = 0
    var acc = 0L
    var accBits = 0
    var bitPos = 0L
    while (produced < ncodes) {
      // refill
      while (accBits < maxLen && bitPos < payloadBits) {
        val byteIdx = bb.position() + (bitPos / 8).toInt
        // read bit bitPos
        val byte = blob(byteIdx)
        val bit = (byte >> (7 - (bitPos % 8))) & 1
        acc = (acc << 1) | bit
        accBits += 1
        bitPos += 1
      }
      // match shortest prefix
      var l = 1
      var found = false
      while (!found && l <= accBits) {
        val prefix = ((acc >>> (accBits - l)) & ((1L << l) - 1)).toInt
        byLenCode.get((l, prefix)) match {
          case Some(s) =>
            out(produced) = s
            produced += 1
            accBits -= l
            acc &= (1L << accBits) - 1
            found = true
          case None => l += 1
        }
      }
      require(found, s"corrupt Huffman stream at symbol $produced")
    }
    out
  }

  /** Serialized codebook size in bytes for `n` distinct symbols (our format). */
  def codebookBytes(nDistinct: Int): Int = 4 + nDistinct * 5 + 4 + 8
}

package repro.compressor

import repro.core.Field
import scala.collection.mutable.ArrayBuffer

/** Output of a predictor's compression pass.
  *
  * @param codes         quantization codes in the predictor's traversal order
  *                      ([[Quantizer.Escape]] marks unpredictable points)
  * @param unpredictable verbatim values for escape codes, in traversal order
  * @param side          predictor side-channel (anchors / regression coeffs),
  *                      must be byte-exact for decompression
  * @param recon         the reconstructed field (what the decompressor yields)
  */
final case class PredictorOutput(
    codes: Array[Int],
    unpredictable: Array[Double],
    side: Array[Byte],
    recon: Field,
) {
  /** Side-channel size in bytes (counted into the compressed size). */
  def sideBytes: Int = side.length
}

/** A prediction-based compressor stage: predicts each point from already
  * reconstructed values (so compressor and decompressor agree bit-for-bit),
  * quantizes the prediction error, and emits codes in a deterministic
  * traversal order that `decompress` replays.
  */
trait Predictor extends Serializable {
  def name: String

  /** Compress: scan the field, produce codes + side data + reconstruction. */
  def compress(field: Field, quant: Quantizer): PredictorOutput

  /** Decompress: rebuild the field from codes/unpredictables/side data. */
  def decompress(dims: Array[Int], quant: Quantizer, codes: Array[Int],
                 unpredictable: Array[Double], side: Array[Byte]): Field
}

object Predictor {
  /** Registry used by CLIs and serialized blobs. */
  val all: Seq[Predictor] = Seq(LorenzoPredictor, InterpolationPredictor, RegressionPredictor)

  def byName(name: String): Predictor =
    all.find(_.name == name).getOrElse(throw new IllegalArgumentException(s"unknown predictor $name"))

  def byId(id: Int): Predictor = all(id)

  def idOf(p: Predictor): Int = all.indexWhere(_.name == p.name)
}

/** First-order Lorenzo predictor [Ibarria et al. 2003], dimension-generic.
  *
  * pred(x) = Σ over non-empty neighbor subsets S of (-1)^(|S|+1) · recon(x - S),
  * with out-of-range neighbors treated as 0 (SZ convention). Scans row-major
  * and predicts from the reconstructed buffer, as real SZ does.
  */
object LorenzoPredictor extends Predictor {
  val name = "lorenzo"

  def compress(field: Field, quant: Quantizer): PredictorOutput = {
    val n = field.size
    val ndim = field.ndim
    val dims = field.dims
    val strides = field.strides
    val recon = new Array[Double](n)
    val codes = new Array[Int](n)
    val unpred = new ArrayBuffer[Double]()
    val coords = new Array[Int](ndim)
    var idx = 0
    while (idx < n) {
      val pred = predictAt(recon, coords, dims, strides)
      val (code, rv) = quant.quantize(pred, field.data(idx))
      codes(idx) = code
      if (code == Quantizer.Escape) unpred += field.data(idx)
      recon(idx) = rv
      // advance odometer (row-major, last dim fastest)
      var d = ndim - 1
      var carry = true
      while (d >= 0 && carry) {
        coords(d) += 1
        if (coords(d) == dims(d)) { coords(d) = 0; d -= 1 } else carry = false
      }
      idx += 1
    }
    PredictorOutput(codes, unpred.toArray, Array.emptyByteArray, Field(recon, dims))
  }

  def decompress(dims: Array[Int], quant: Quantizer, codes: Array[Int],
                 unpredictable: Array[Double], side: Array[Byte]): Field = {
    val n = dims.product
    val ndim = dims.length
    val strides = Field(new Array[Double](n), dims).strides
    val recon = new Array[Double](n)
    val coords = new Array[Int](ndim)
    var u = 0
    var idx = 0
    while (idx < n) {
      val code = codes(idx)
      if (code == Quantizer.Escape) { recon(idx) = unpredictable(u); u += 1 }
      else recon(idx) = quant.reconstruct(predictAt(recon, coords, dims, strides), code)
      var d = ndim - 1
      var carry = true
      while (d >= 0 && carry) {
        coords(d) += 1
        if (coords(d) == dims(d)) { coords(d) = 0; d -= 1 } else carry = false
      }
      idx += 1
    }
    Field(recon, dims)
  }

  /** Lorenzo prediction at `coords` from the (partially filled) recon buffer.
    * Visible for the model's sampler, which predicts from *original* values.
    */
  def predictAt(buf: Array[Double], coords: Array[Int], dims: Array[Int], strides: Array[Int]): Double = {
    val ndim = dims.length
    val nMask = (1 << ndim) - 1
    var pred = 0.0
    var mask = 1
    while (mask <= nMask) {
      var ok = true
      var off = 0
      var d = 0
      while (d < ndim && ok) {
        if ((mask & (1 << d)) != 0) {
          if (coords(d) == 0) ok = false else off += strides(d)
        }
        d += 1
      }
      if (ok) {
        val sign = if (Integer.bitCount(mask) % 2 == 1) 1.0 else -1.0
        pred += sign * buf(computeIndex(coords, strides) - off)
      }
      mask += 1
    }
    pred
  }

  private def computeIndex(coords: Array[Int], strides: Array[Int]): Int = {
    var idx = 0; var i = 0
    while (i < coords.length) { idx += coords(i) * strides(i); i += 1 }
    idx
  }
}

/** Multilevel linear-interpolation predictor (SZ3-style [Zhao et al., ICDE'21]).
  *
  * Anchor points on the coarsest 2^L grid are stored verbatim in the side
  * channel; each level then halves the grid spacing, one dimension at a time,
  * predicting midpoints as the average of the two known neighbors along that
  * dimension (boundary midpoints copy the left neighbor). Codes are emitted in
  * the deterministic level/dim traversal order that `decompress` replays.
  */
object InterpolationPredictor extends Predictor {
  val name = "interp"

  /** Coarsest grid spacing. Anchors are dims/64-ish per dim — tiny overhead. */
  val MaxStride = 64

  def compress(field: Field, quant: Quantizer): PredictorOutput = {
    val dims = field.dims
    val n = field.size
    val recon = new Array[Double](n)
    val codes = new ArrayBuffer[Int](n)
    val unpred = new ArrayBuffer[Double]()
    val anchors = new ArrayBuffer[Double]()

    traverse(dims) { (idx, isAnchor, predIdx1, predIdx2) =>
      if (isAnchor) {
        recon(idx) = field.data(idx)
        anchors += field.data(idx)
      } else {
        val pred =
          if (predIdx2 >= 0) 0.5 * (recon(predIdx1) + recon(predIdx2))
          else recon(predIdx1)
        val (code, rv) = quant.quantize(pred, field.data(idx))
        codes += code
        if (code == Quantizer.Escape) unpred += field.data(idx)
        recon(idx) = rv
      }
    }
    PredictorOutput(codes.toArray, unpred.toArray, serializeDoubles(anchors.toArray), Field(recon, dims))
  }

  def decompress(dims: Array[Int], quant: Quantizer, codes: Array[Int],
                 unpredictable: Array[Double], side: Array[Byte]): Field = {
    val n = dims.product
    val recon = new Array[Double](n)
    val anchors = deserializeDoubles(side)
    var a = 0; var c = 0; var u = 0
    traverse(dims) { (idx, isAnchor, predIdx1, predIdx2) =>
      if (isAnchor) { recon(idx) = anchors(a); a += 1 }
      else {
        val code = codes(c); c += 1
        if (code == Quantizer.Escape) { recon(idx) = unpredictable(u); u += 1 }
        else {
          val pred =
            if (predIdx2 >= 0) 0.5 * (recon(predIdx1) + recon(predIdx2))
            else recon(predIdx1)
          recon(idx) = quant.reconstruct(pred, code)
        }
      }
    }
    Field(recon, dims)
  }

  /** Shared deterministic traversal. Calls `f(idx, isAnchor, p1, p2)` for
    * every point exactly once: anchors first (p1=p2=-1), then per
    * level (stride s = MaxStride, MaxStride/2, …, 2) and per dimension d the
    * midpoints, with p1/p2 the linear indices of the left/right neighbors
    * along d (p2 = -1 at the right boundary).
    */
  def traverse(dims: Array[Int])(f: (Int, Boolean, Int, Int) => Unit): Unit = {
    val ndim = dims.length
    val strides = Field(new Array[Double](dims.product), dims).strides

    // anchors: all coords ≡ 0 (mod MaxStride)
    foreachGrid(dims, Array.fill(ndim)(MaxStride), Array.fill(ndim)(0)) { coords =>
      f(linIndex(coords, strides), true, -1, -1)
    }

    var s = MaxStride
    while (s >= 2) {
      val h = s / 2
      var d = 0
      while (d < ndim) {
        // point pattern: coord_j ≡ 0 mod h for j<d; coord_d ≡ h mod s; coord_j ≡ 0 mod s for j>d
        val steps = new Array[Int](ndim)
        val offs = new Array[Int](ndim)
        var j = 0
        while (j < ndim) {
          if (j < d) { steps(j) = h; offs(j) = 0 }
          else if (j == d) { steps(j) = s; offs(j) = h }
          else { steps(j) = s; offs(j) = 0 }
          j += 1
        }
        foreachGrid(dims, steps, offs) { coords =>
          val idx = linIndex(coords, strides)
          val left = idx - h * strides(d)
          val rightCoord = coords(d) + h
          val right = if (rightCoord < dims(d)) idx + h * strides(d) else -1
          f(idx, false, left, right)
        }
        d += 1
      }
      s = h
    }
  }

  /** Iterate coords over the grid {offs(d), offs(d)+steps(d), ...} ∩ dims, row-major. */
  private def foreachGrid(dims: Array[Int], steps: Array[Int], offs: Array[Int])(f: Array[Int] => Unit): Unit = {
    val ndim = dims.length
    val coords = offs.clone()
    var d = 0
    while (d < ndim) { if (coords(d) >= dims(d)) return; d += 1 }
    var done = false
    while (!done) {
      f(coords)
      var i = ndim - 1
      var carry = true
      while (i >= 0 && carry) {
        coords(i) += steps(i)
        if (coords(i) >= dims(i)) { coords(i) = offs(i); i -= 1 } else carry = false
      }
      if (carry) done = true
    }
  }

  private def linIndex(coords: Array[Int], strides: Array[Int]): Int = {
    var idx = 0; var i = 0
    while (i < coords.length) { idx += coords(i) * strides(i); i += 1 }
    idx
  }

  private[compressor] def serializeDoubles(a: Array[Double]): Array[Byte] = {
    val bb = java.nio.ByteBuffer.allocate(a.length * 8)
    a.foreach(bb.putDouble)
    bb.array()
  }

  private[compressor] def deserializeDoubles(b: Array[Byte]): Array[Double] = {
    val bb = java.nio.ByteBuffer.wrap(b)
    Array.fill(b.length / 8)(bb.getDouble)
  }
}

/** Block-wise linear-regression predictor (SZ "high-ratio" mode
  * [Liang et al., BigData'18]). Each block of edge [[RegressionPredictor.blockEdge]]
  * is fit with a least-squares hyperplane f(x) = b0 + Σ b_d·x_d on the original
  * data; coefficients are rounded to Float and stored in the side channel
  * (the decompressor uses the identical rounded values), then per-point
  * residuals are quantized.
  */
object RegressionPredictor extends Predictor {
  val name = "regression"

  /** Block edge per dimensionality: ≥~200 points per block keeps the 4-float
    * coefficient overhead well under 1 bit/point. SZ uses 6 for 3-D.
    */
  def blockEdge(ndim: Int): Int = ndim match {
    case 1 => 128
    case 2 => 12
    case 3 => 6
    case _ => 4
  }

  def compress(field: Field, quant: Quantizer): PredictorOutput = {
    val dims = field.dims
    val ndim = dims.length
    val be = blockEdge(ndim)
    val codes = new ArrayBuffer[Int](field.size)
    val unpred = new ArrayBuffer[Double]()
    val coeffBuf = new ArrayBuffer[Float]()
    val recon = new Array[Double](field.size)

    foreachBlock(dims, be) { (lo, hi) =>
      val coeffs = fitBlock(field, lo, hi)
      val fcoeffs = coeffs.map(_.toFloat)
      fcoeffs.foreach(coeffBuf += _)
      foreachPointInBlock(field, lo, hi) { (idx, coords) =>
        val pred = evalPlane(fcoeffs, coords, lo)
        val (code, rv) = quant.quantize(pred, field.data(idx))
        codes += code
        if (code == Quantizer.Escape) unpred += field.data(idx)
        recon(idx) = rv
      }
    }
    val side = {
      val bb = java.nio.ByteBuffer.allocate(coeffBuf.length * 4)
      coeffBuf.foreach(bb.putFloat)
      bb.array()
    }
    PredictorOutput(codes.toArray, unpred.toArray, side, Field(recon, dims))
  }

  def decompress(dims: Array[Int], quant: Quantizer, codes: Array[Int],
                 unpredictable: Array[Double], side: Array[Byte]): Field = {
    val ndim = dims.length
    val be = blockEdge(ndim)
    val recon = new Array[Double](dims.product)
    val dummy = Field(recon, dims)
    val bb = java.nio.ByteBuffer.wrap(side)
    var c = 0; var u = 0
    foreachBlock(dims, be) { (lo, hi) =>
      val fcoeffs = Array.fill(ndim + 1)(bb.getFloat)
      foreachPointInBlock(dummy, lo, hi) { (idx, coords) =>
        val code = codes(c); c += 1
        if (code == Quantizer.Escape) { recon(idx) = unpredictable(u); u += 1 }
        else recon(idx) = quant.reconstruct(evalPlane(fcoeffs, coords, lo), code)
      }
    }
    Field(recon, dims)
  }

  /** Least-squares fit of b0 + Σ b_d·(x_d - lo_d) over the block. Falls back
    * to the block mean if the normal equations are singular (1-point blocks).
    */
  def fitBlock(field: Field, lo: Array[Int], hi: Array[Int]): Array[Double] = {
    val ndim = lo.length
    val k = ndim + 1
    val ata = Array.ofDim[Double](k, k)
    val atb = new Array[Double](k)
    val x = new Array[Double](k)
    foreachPointInBlock(field, lo, hi) { (idx, coords) =>
      x(0) = 1.0
      var d = 0
      while (d < ndim) { x(d + 1) = (coords(d) - lo(d)).toDouble; d += 1 }
      var i = 0
      while (i < k) {
        var j = 0
        while (j < k) { ata(i)(j) += x(i) * x(j); j += 1 }
        atb(i) += x(i) * field.data(idx)
        i += 1
      }
    }
    solve(ata, atb).getOrElse {
      // singular (degenerate block): constant prediction at block mean
      val out = new Array[Double](k)
      out(0) = atb(0) / math.max(1.0, ata(0)(0))
      out
    }
  }

  private def evalPlane(coeffs: Array[Float], coords: Array[Int], lo: Array[Int]): Double = {
    var p = coeffs(0).toDouble
    var d = 0
    while (d < lo.length) { p += coeffs(d + 1).toDouble * (coords(d) - lo(d)); d += 1 }
    p
  }

  /** Gaussian elimination with partial pivoting; None if singular. */
  private[compressor] def solve(aIn: Array[Array[Double]], bIn: Array[Double]): Option[Array[Double]] = {
    val k = bIn.length
    val a = aIn.map(_.clone())
    val b = bIn.clone()
    var col = 0
    while (col < k) {
      var piv = col
      var r = col + 1
      while (r < k) { if (math.abs(a(r)(col)) > math.abs(a(piv)(col))) piv = r; r += 1 }
      if (math.abs(a(piv)(col)) < 1e-12) return None
      if (piv != col) { val t = a(piv); a(piv) = a(col); a(col) = t; val tb = b(piv); b(piv) = b(col); b(col) = tb }
      r = col + 1
      while (r < k) {
        val fac = a(r)(col) / a(col)(col)
        var c2 = col
        while (c2 < k) { a(r)(c2) -= fac * a(col)(c2); c2 += 1 }
        b(r) -= fac * b(col)
        r += 1
      }
      col += 1
    }
    val out = new Array[Double](k)
    var i = k - 1
    while (i >= 0) {
      var s = b(i)
      var j = i + 1
      while (j < k) { s -= a(i)(j) * out(j); j += 1 }
      out(i) = s / a(i)(i)
      i -= 1
    }
    Some(out)
  }

  /** Iterate blocks row-major; f(lo, hi) with hi exclusive. */
  def foreachBlock(dims: Array[Int], be: Int)(f: (Array[Int], Array[Int]) => Unit): Unit = {
    val ndim = dims.length
    val nBlocks = dims.map(d => (d + be - 1) / be)
    val bc = new Array[Int](ndim)
    var done = false
    while (!done) {
      val lo = Array.tabulate(ndim)(d => bc(d) * be)
      val hi = Array.tabulate(ndim)(d => math.min(dims(d), lo(d) + be))
      f(lo, hi)
      var i = ndim - 1
      var carry = true
      while (i >= 0 && carry) {
        bc(i) += 1
        if (bc(i) == nBlocks(i)) { bc(i) = 0; i -= 1 } else carry = false
      }
      if (carry) done = true
    }
  }

  /** Iterate points of a block row-major; f(linearIdx, coords). */
  def foreachPointInBlock(field: Field, lo: Array[Int], hi: Array[Int])(f: (Int, Array[Int]) => Unit): Unit = {
    val ndim = lo.length
    val coords = lo.clone()
    var done = false
    while (!done) {
      f(field.index(coords), coords)
      var i = ndim - 1
      var carry = true
      while (i >= 0 && carry) {
        coords(i) += 1
        if (coords(i) == hi(i)) { coords(i) = lo(i); i -= 1 } else carry = false
      }
      if (carry) done = true
    }
  }
}

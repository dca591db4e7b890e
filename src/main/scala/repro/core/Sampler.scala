package repro.core

import repro.compressor.{InterpolationPredictor, LorenzoPredictor, Predictor, RegressionPredictor}

/** A 1 % (configurable) sample of prediction errors plus the field summary
  * statistics the ratio-quality model needs. Produced once per
  * (field, predictor); every estimate for any error bound derives from it
  * (§III-D: "one-time sampling and efficient estimation").
  *
  * @param predictor   predictor name the errors correspond to
  * @param errors      sampled prediction errors (predicted − actual, on
  *                    original values, per §III-D4)
  * @param sampleRate  requested sampling rate
  * @param totalPoints points in the full field
  * @param range       value range of the full field (max − min)
  * @param variance    variance of the full field (for the SSIM model)
  * @param sideBytes   predictor side-channel bytes the real compressor will
  *                    spend (anchors / regression coefficients) — known
  *                    exactly from dims, used for whole-size estimates
  */
/** A sampled patch: a small block of original values with a one-layer halo on
  * the low side of every dimension (the halo seeds the recon buffer, so a
  * patch-local compression simulation sees realistic borders).
  */
final case class SamplePatch(data: Array[Double], dims: Array[Int])

final case class PredictionErrorSample(
    predictor: String,
    errors: Array[Double],
    sampleRate: Double,
    totalPoints: Int,
    range: Double,
    variance: Double,
    sideBytes: Long,
    ndim: Int,
    patches: Array[SamplePatch] = Array.empty,
) {
  require(errors.nonEmpty, "empty prediction-error sample")

  /** |errors| sorted ascending — quantile lookups for the p0 anchors. */
  lazy val absSorted: Array[Double] = {
    val a = errors.map(math.abs)
    java.util.Arrays.sort(a)
    a
  }

  /** Error magnitude below which a fraction `p` of points falls (the central
    * bin half-width that yields p0 = p, §III-C1's anchor profiling).
    */
  def absQuantile(p: Double): Double = {
    val i = math.min(absSorted.length - 1, math.max(0, (p * absSorted.length).toInt))
    absSorted(i)
  }

  /** Std-dev of the sampled prediction errors (sampling-accuracy metric of
    * Fig. 4 / Table II "Sample Err" compares this against the full scan).
    */
  def errorStd: Double = {
    val n = errors.length
    var mu = 0.0
    var i = 0
    while (i < n) { mu += errors(i); i += 1 }
    mu /= n
    var s = 0.0
    i = 0
    while (i < n) { val d = errors(i) - mu; s += d * d; i += 1 }
    math.sqrt(s / n)
  }
}

/** Per-predictor sampling strategies (§III-D). All predict from *original*
  * values — the paper's observation III-D4 is that the error distribution
  * differs little from the reconstruction-based one, and the high-error-bound
  * discrepancy is handled by the Eq. 9 correction layer.
  */
object Sampler {

  val DefaultRate = 0.01

  def sample(field: Field, predictor: Predictor, rate: Double = DefaultRate, seed: Long = 42L): PredictionErrorSample =
    predictor match {
      case LorenzoPredictor       => lorenzo(field, rate, seed)
      case InterpolationPredictor => interpolation(field, rate, seed)
      case RegressionPredictor    => regression(field, rate, seed)
      case p                      => throw new IllegalArgumentException(s"no sampling strategy for ${p.name}")
    }

  /** Minimum sample count: below this the plug-in entropy estimate is too
    * biased even with the Miller–Madow correction. Small fields simply get a
    * higher effective rate.
    */
  val MinSamples = 1024

  /** Patch edge for the Lorenzo block sampler (SZ3 samples structured data
    * blocks, §V-D); big enough that patch-local reconstruction feedback
    * (drift, denoising) shows, small enough that ~1 % sampling still yields
    * tens of patches.
    */
  def patchEdge(ndim: Int): Int = ndim match {
    case 1 => 128
    case 2 => 12
    case 3 => 6
    case _ => 4
  }

  /** Lorenzo: random structured blocks (SZ3-style, §III-D1). The per-point
    * prediction errors on original values feed the Fig. 4 sampling-accuracy
    * metric and the anchor quantiles; the raw patches (with a low-side halo)
    * let the model simulate the quantizer with reconstruction feedback per
    * error bound (§III-D4) instead of guessing the feedback analytically.
    */
  def lorenzo(field: Field, rate: Double, seed: Long): PredictionErrorSample = {
    val rnd = new java.util.Random(seed)
    val n = field.size
    val m = math.min(n, math.max(MinSamples, (n * rate).toInt))
    val ndim = field.ndim
    val edge = patchEdge(ndim)
    // patch extent including the low-side halo, clamped to the field extent
    val ext = field.dims.map(d => math.min(d, edge + 1))
    val vol = math.max(1, ext.map(e => math.max(1, e - 1)).product)
    val k = math.max(4, (m + vol - 1) / vol)
    val errors = scala.collection.mutable.ArrayBuffer.empty[Double]
    val patches = new Array[SamplePatch](k)
    var p = 0
    while (p < k) {
      val lo = Array.tabulate(ndim)(d => rnd.nextInt(field.dims(d) - ext(d) + 1))
      val data = new Array[Double](ext.product)
      val coords = new Array[Int](ndim)
      val gl = new Array[Int](ndim)
      var idx = 0
      val pn = ext.product
      while (idx < pn) {
        var d = 0
        while (d < ndim) { gl(d) = lo(d) + coords(d); d += 1 }
        data(idx) = field(gl)
        // collect the original-value prediction error for interior points
        var interior = true
        d = 0
        while (d < ndim && interior) { if (coords(d) == 0 && ext(d) > 1) interior = false; d += 1 }
        if (interior) {
          val pred = LorenzoPredictor.predictAt(field.data, gl, field.dims, field.strides)
          errors += field(gl) - pred
        }
        d = ndim - 1
        var carry = true
        while (d >= 0 && carry) {
          coords(d) += 1
          if (coords(d) == ext(d)) { coords(d) = 0; d -= 1 } else carry = false
        }
        idx += 1
      }
      patches(p) = SamplePatch(data, ext.clone())
      p += 1
    }
    if (errors.isEmpty) errors += 0.0
    PredictionErrorSample(LorenzoPredictor.name, errors.toArray, rate, field.size,
      field.valueRange, field.variance, 0L, ndim, patches)
  }

  /** Interpolation: walk the level/dim traversal and accept each non-anchor
    * point with probability `rate`; because level populations shrink by 2^-n
    * per level, this realizes the paper's per-level sampling-rate scaling
    * (§III-D2) while staying deterministic.
    */
  def interpolation(field: Field, rate: Double, seed: Long): PredictionErrorSample = {
    val rnd = new java.util.Random(seed)
    val effRate = math.max(rate, MinSamples.toDouble / field.size)
    val buf = scala.collection.mutable.ArrayBuffer.empty[Double]
    InterpolationPredictor.traverse(field.dims) { (idx, isAnchor, p1, p2) =>
      if (!isAnchor && rnd.nextDouble() < effRate) {
        val pred =
          if (p2 >= 0) 0.5 * (field.data(p1) + field.data(p2))
          else field.data(p1)
        buf += field.data(idx) - pred
      }
    }
    if (buf.isEmpty) buf += 0.0
    val anchors = countAnchors(field.dims)
    PredictionErrorSample(InterpolationPredictor.name, buf.toArray, rate, field.size,
      field.valueRange, field.variance, anchors * 8L, field.ndim)
  }

  /** Regression: sample whole blocks (the fit needs the block, §III-D3),
    * fit each sampled block on original values and collect its residuals.
    */
  def regression(field: Field, rate: Double, seed: Long): PredictionErrorSample = {
    val rnd = new java.util.Random(seed)
    val be = RegressionPredictor.blockEdge(field.ndim)
    val buf = scala.collection.mutable.ArrayBuffer.empty[Double]
    var nBlocks = 0
    RegressionPredictor.foreachBlock(field.dims, be) { (_, _) => nBlocks += 1 }
    // sample a fixed subset of block indices: enough blocks for a
    // representative histogram even on small fields (§III-D3 relies on the
    // block unit being small relative to the data)
    val pointsPerBlock = math.max(1, field.size / nBlocks)
    val wanted = math.min(nBlocks,
      math.max(math.max(8, MinSamples / pointsPerBlock), math.ceil(rate * nBlocks).toInt))
    val chosen = new java.util.HashSet[Integer]()
    while (chosen.size < wanted) chosen.add(rnd.nextInt(nBlocks))
    var bi = 0
    RegressionPredictor.foreachBlock(field.dims, be) { (lo, hi) =>
      if (chosen.contains(bi)) {
        val coeffs = RegressionPredictor.fitBlock(field, lo, hi).map(_.toFloat)
        RegressionPredictor.foreachPointInBlock(field, lo, hi) { (idx, coords) =>
          var pred = coeffs(0).toDouble
          var d = 0
          while (d < lo.length) { pred += coeffs(d + 1).toDouble * (coords(d) - lo(d)); d += 1 }
          buf += field.data(idx) - pred
        }
      }
      bi += 1
    }
    PredictionErrorSample(RegressionPredictor.name, buf.toArray, rate, field.size,
      field.valueRange, field.variance, nBlocks.toLong * (field.ndim + 1) * 4L, field.ndim)
  }

  /** Full-scan reference errors (used only by tests/benches to quantify the
    * sampling error of Fig. 4 — never by the model itself).
    */
  def fullErrors(field: Field, predictor: Predictor): Array[Double] = predictor match {
    case LorenzoPredictor =>
      val out = new Array[Double](field.size)
      var idx = 0
      val coords = new Array[Int](field.ndim)
      while (idx < field.size) {
        out(idx) = field.data(idx) - LorenzoPredictor.predictAt(field.data, coords, field.dims, field.strides)
        var d = field.ndim - 1
        var carry = true
        while (d >= 0 && carry) {
          coords(d) += 1
          if (coords(d) == field.dims(d)) { coords(d) = 0; d -= 1 } else carry = false
        }
        idx += 1
      }
      out
    case InterpolationPredictor =>
      val buf = scala.collection.mutable.ArrayBuffer.empty[Double]
      InterpolationPredictor.traverse(field.dims) { (idx, isAnchor, p1, p2) =>
        if (!isAnchor) {
          val pred = if (p2 >= 0) 0.5 * (field.data(p1) + field.data(p2)) else field.data(p1)
          buf += field.data(idx) - pred
        }
      }
      buf.toArray
    case RegressionPredictor =>
      val be = RegressionPredictor.blockEdge(field.ndim)
      val buf = scala.collection.mutable.ArrayBuffer.empty[Double]
      RegressionPredictor.foreachBlock(field.dims, be) { (lo, hi) =>
        val coeffs = RegressionPredictor.fitBlock(field, lo, hi).map(_.toFloat)
        RegressionPredictor.foreachPointInBlock(field, lo, hi) { (idx, coords) =>
          var pred = coeffs(0).toDouble
          var d = 0
          while (d < lo.length) { pred += coeffs(d + 1).toDouble * (coords(d) - lo(d)); d += 1 }
          buf += field.data(idx) - pred
        }
      }
      buf.toArray
    case p => throw new IllegalArgumentException(s"no full-error scan for ${p.name}")
  }

  private def build(field: Field, predictor: Predictor, errors: Array[Double], rate: Double): PredictionErrorSample =
    PredictionErrorSample(predictor.name, errors, rate, field.size, field.valueRange, field.variance, 0L, field.ndim)

  /** Anchor count of the interpolation predictor for given dims. */
  def countAnchors(dims: Array[Int]): Long =
    dims.map(d => ((d - 1) / InterpolationPredictor.MaxStride + 1).toLong).product
}

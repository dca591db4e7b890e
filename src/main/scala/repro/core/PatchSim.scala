package repro.core

import repro.compressor.{LorenzoPredictor, Quantizer}

/** Patch-local compression simulation (the refined correction layer of
  * §III-D4, in the shape of SZ3's own block sampler §V-D).
  *
  * For each sampled patch the quantizer is replayed exactly as the real
  * compressor would run it — predicting from the *reconstructed* buffer —
  * so reconstruction-feedback effects (drift at high error bounds,
  * denoising of sub-bound noise) appear in the quantization-code histogram
  * and the compression-error distribution without any analytic correction.
  * Cost per estimate stays O(|sample|): no Huffman build, no full-field
  * pass — the gap to trial-and-error (Fig. 9) is preserved.
  */
object PatchSim {

  /** @param hist        simulated quantization-code histogram
    * @param errVariance mean squared reconstruction error across patches
    * @param varNear     error variance over points close to the seeded halo
    * @param varFar      error variance over points deep inside the patch
    * @param deltaSteps  mean Manhattan-distance gap between the two groups —
    *                    the number of drift steps separating them
    */
  final case class Result(hist: CodeHistogram, errVariance: Double,
                          varNear: Double, varFar: Double, deltaSteps: Double,
                          medianGrowth: Double = 0.0) {
    def p0: Double = hist.p0

    /** Per-step growth of the drift variance (0 when errors are stationary
      * inside the patch — the noise/denoising regime). The median across
      * patches, so a few heterogeneous patches (a dense cosmology blob, a
    * detector peak) cannot fake field-wide drift.
      */
    def driftGrowthPerStep: Double = medianGrowth

    /** Fraction of non-central codes observed in the simulation. */
    def nonZeroRate: Double = 1.0 - hist.p0
  }

  /** Simulate the Lorenzo pipeline over the patches at error bound `eb`.
    * Halo points (local coordinate 0 in any dim of extent > 1) seed the
    * recon buffer with original values and are not coded.
    */
  def simulate(patches: Array[SamplePatch], eb: Double, radius: Int = 32768): Result = {
    require(patches.nonEmpty, "no patches to simulate")
    val quant = new Quantizer(eb, radius)
    val counts = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    var sumSq = 0.0
    var nCoded = 0L
    var sqNear = 0.0; var nNear = 0L; var distNear = 0.0
    var sqFar = 0.0; var nFar = 0L; var distFar = 0.0
    val growths = new Array[Double](patches.length)
    var pi = 0
    patches.foreach { patch =>
      val dims = patch.dims
      val ndim = dims.length
      val dMid = dims.map(d => (d - 1) / 2.0).sum
      val recon = patch.data.clone()
      val f = Field(recon, dims)
      val strides = f.strides
      val coords = new Array[Int](ndim)
      var pSqN = 0.0; var pNN = 0L; var pDN = 0.0
      var pSqF = 0.0; var pNF = 0L; var pDF = 0.0
      var idx = 0
      val n = recon.length
      while (idx < n) {
        var interior = true
        var d = 0
        while (d < ndim && interior) { if (coords(d) == 0 && dims(d) > 1) interior = false; d += 1 }
        if (interior) {
          val pred = LorenzoPredictor.predictAt(recon, coords, dims, strides)
          val (code, rv) = quant.quantize(pred, patch.data(idx))
          counts(code) += 1
          recon(idx) = rv
          val e = rv - patch.data(idx)
          sumSq += e * e
          nCoded += 1
          var dist = 0.0
          d = 0
          while (d < ndim) { dist += coords(d); d += 1 }
          if (dist <= dMid) { pSqN += e * e; pNN += 1; pDN += dist }
          else { pSqF += e * e; pNF += 1; pDF += dist }
        }
        d = ndim - 1
        var carry = true
        while (d >= 0 && carry) {
          coords(d) += 1
          if (coords(d) == dims(d)) { coords(d) = 0; d -= 1 } else carry = false
        }
        idx += 1
      }
      sqNear += pSqN; nNear += pNN; distNear += pDN
      sqFar += pSqF; nFar += pNF; distFar += pDF
      val pDelta = (if (pNF > 0) pDF / pNF else 0.0) - (if (pNN > 0) pDN / pNN else 0.0)
      growths(pi) =
        if (pDelta > 0 && pNN > 0 && pNF > 0) math.max(0.0, (pSqF / pNF - pSqN / pNN) / pDelta)
        else 0.0
      pi += 1
    }
    if (nCoded == 0) Result(CodeHistogram(Map(0 -> 1L), 1L), 0.0, 0.0, 0.0, 0.0)
    else {
      val vN = if (nNear > 0) sqNear / nNear else 0.0
      val vF = if (nFar > 0) sqFar / nFar else 0.0
      val dd = (if (nFar > 0) distFar / nFar else 0.0) - (if (nNear > 0) distNear / nNear else 0.0)
      java.util.Arrays.sort(growths)
      val med = growths(growths.length / 2)
      Result(CodeHistogram(counts.toMap, nCoded), sumSq / nCoded, vN, vF, dd, med)
    }
  }
}

package repro.sparkapi

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.analysis.Metrics
import repro.compressor.{Compressor, Predictor}
import repro.core.{RQModel, Sampler}

/** Per-chunk ratio-quality stats: the model's estimates next to the measured
  * values from actually running the compressor on the same chunk. One row per
  * (chunk, error bound). Produced inside executors via mapPartitions — the
  * paper's per-rank in-situ modeling.
  *
  * Measured/estimated pairs carry everything Table II grades: Huffman
  * bit-rate, Huffman+lossless bit-rate, lossless-stage extra ratio, PSNR,
  * SSIM, plus the sampling-accuracy inputs (sampled vs full prediction-error
  * std-dev).
  */
final case class ChunkRQStats(
    dataset: String,
    field: String,
    chunkId: Int,
    n: Long,
    ebRel: Double,
    ebAbs: Double,
    range: Double,
    // model estimates
    estHuffBitRate: Double,
    estLLBitRate: Double,
    estLosslessGain: Double,
    estErrVariance: Double,
    estPsnr: Double,
    estSsim: Double,
    estTotalBytes: Long,
    estP0: Double,
    // measured by the real compressor
    measHuffBitRate: Double,
    measLLBitRate: Double,
    measLosslessGain: Double,
    measSumSqErr: Double,
    measPsnr: Double,
    measSsim: Double,
    measTotalBytes: Long,
    measP0: Double,
    // sampling accuracy (Fig. 4 / Table II col 1)
    sampledErrStd: Double,
    fullErrStd: Double,
)

object ModelPipeline {

  /** Run the model and the real compressor on every chunk × error bound.
    * Error bounds are value-range-relative (`ebRels`), converted to absolute
    * per chunk — SZ's value-range-relative mode.
    */
  def modelAndMeasure(
      chunks: Dataset[ChunkRow],
      ebRels: Seq[Double],
      predictor: Predictor,
      sampleRate: Double = Sampler.DefaultRate,
      withFullScan: Boolean = true,
  ): Dataset[ChunkRQStats] = {
    val spark = chunks.sparkSession
    import spark.implicits._
    chunks.mapPartitions { it =>
      it.flatMap { row =>
        val f = row.toField
        val range = f.valueRange
        val model = RQModel.build(f, predictor, sampleRate, seed = 42L + row.chunkId)
        val fullStd =
          if (withFullScan) stddev(Sampler.fullErrors(f, predictor))
          else Double.NaN
        ebRels.map { ebRel =>
          val ebAbs = math.max(ebRel * range, 1e-300)
          val est = model.estimate(ebAbs)
          val res = Compressor.compress(f, ebAbs, predictor)
          val sumSq = {
            var s = 0.0; var i = 0
            while (i < f.size) { val d = res.recon.data(i) - f.data(i); s += d * d; i += 1 }
            s
          }
          ChunkRQStats(
            dataset = row.dataset, field = row.field, chunkId = row.chunkId,
            n = f.size.toLong, ebRel = ebRel, ebAbs = ebAbs, range = range,
            estHuffBitRate = est.huffBitRate,
            estLLBitRate = est.llBitRate,
            estLosslessGain = est.huffBitRate / math.max(est.llBitRate, 1e-12),
            estErrVariance = est.errVariance,
            estPsnr = est.psnr,
            estSsim = est.ssim,
            estTotalBytes = est.estTotalBytes,
            estP0 = est.p0,
            measHuffBitRate = res.huffBitRate,
            measLLBitRate = res.huffLLBitRate,
            measLosslessGain = res.losslessGain,
            measSumSqErr = sumSq,
            measPsnr = Metrics.psnr(f, res.recon),
            measSsim = Metrics.ssimGlobal(f, res.recon),
            measTotalBytes = res.huffPlusLLBytes,
            measP0 = res.p0,
            sampledErrStd = model.sample.errorStd,
            fullErrStd = fullStd,
          )
        }
      }
    }
  }

  /** Field-level aggregation of per-chunk stats, expressed in Spark SQL so it
    * can be oracle-checked against DuckDB: point-weighted bit-rates, global
    * MSE → PSNR, weighted SSIM, weighted sampling error.
    */
  def aggregateByField(stats: Dataset[ChunkRQStats]): DataFrame = {
    def wavg(c: String) = (sum(col("n") * col(c)) / sum(col("n"))).as(c)
    stats.toDF.groupBy("dataset", "field", "ebRel").agg(
      wavg("estHuffBitRate"),
      wavg("measHuffBitRate"),
      wavg("estLLBitRate"),
      wavg("measLLBitRate"),
      wavg("estLosslessGain"),
      wavg("measLosslessGain"),
      wavg("estErrVariance"),
      (sum(col("measSumSqErr")) / sum(col("n"))).as("measMse"),
      max(col("range")).as("range"),
      wavg("estSsim"),
      wavg("measSsim"),
      wavg("sampledErrStd"),
      wavg("fullErrStd"),
      sum(col("estTotalBytes")).as("estTotalBytes"),
      sum(col("measTotalBytes")).as("measTotalBytes"),
      sum(col("n")).as("n"),
    )
  }

  private def stddev(a: Array[Double]): Double = {
    if (a.isEmpty) return 0.0
    var mu = 0.0; var i = 0
    while (i < a.length) { mu += a(i); i += 1 }
    mu /= a.length
    var s = 0.0; i = 0
    while (i < a.length) { val d = a(i) - mu; s += d * d; i += 1 }
    math.sqrt(s / a.length)
  }

}

package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.{col, lit}

/** Full ISLA output: the final answer plus everything the paper's
  * evaluation section reports about a run (sketch₀, rate, partials).
  */
final case class IslaResult(
    answer: Double,
    sketch0: Double,
    sigma: Double,
    rate: Double,
    dataSize: Long,
    shift: Double,
    blocks: Seq[BlockResult],
) {
  /** Per-block partial answers (Table IV's "Partial 1..b"). */
  def partials: Seq[Double] = blocks.map(_.avg)
}

/** ISLA end to end (Fig. 2): Pre-estimation → per-block Calculation
  * (sampling + iteration) → Summarization.
  *
  * The two data-touching phases are Spark jobs (pilot aggregates and the
  * single-pass per-block moment aggregation of Algorithm 1); the
  * iteration phase is O(b·log(|D⁰|/thr)) scalar work on the driver, and
  * Summarization is the size-weighted merge Σ avg_j·|Bⱼ|/M.
  *
  * Negative data are handled per footnote 1 of §IV-A2: when the pilot
  * sees values ≤ 0 the whole computation runs on `value + shift`
  * (shift = σ − pilotMin, keeping everything strictly positive) and the
  * final answer is translated back.
  */
object Isla {

  /** Run ISLA on a blocked DataFrame.
    *
    * @param df       input with `valueCol` (numeric) and `blockCol` (block id)
    * @param valueCol aggregation column
    * @param p        algorithm parameters (paper defaults)
    * @param sizes    optional precomputed block sizes (metadata); computed if absent
    * @param seed     RNG seed; the pilot uses seed, the main pass seed+2
    */
  def run(
      df: DataFrame,
      valueCol: String,
      p: IslaParams = IslaParams(),
      sizes: Option[Map[Long, Long]] = None,
      blockCol: String = "block",
      seed: Long = 7L,
  ): IslaResult = {
    val blockSizes = sizes.getOrElse(Moments.blockSizes(df, blockCol))
    val m = blockSizes.values.sum
    require(m > 0, "empty input")

    val pre = PreEstimation.run(df, valueCol, m, p, seed)

    // Footnote 1: translate to strictly positive values when needed.
    val shift = if (pre.pilotMin <= 0) -pre.pilotMin + math.max(pre.sigma, 1.0) else 0.0
    val workDf = if (shift == 0) df else df.withColumn(valueCol, col(valueCol) + lit(shift))
    val sketch0 = pre.sketch0 + shift

    val rate = p.rateOverride.getOrElse {
      if (pre.sigma <= 0) math.min(1.0, p.sigmaPilot.toDouble / m) // constant data
      else math.min(1.0, SampleSize.samplingRate(pre.sigma, p.e, p.beta, m) * p.rateFraction)
    }
    val bounds = Boundaries(sketch0, pre.sigma, p.p1, p.p2)

    val moments = Moments.collect(workDf, valueCol, rate, bounds, blockSizes, blockCol, seed + 2)
    val blocks = moments.map(Modulation.solveBlock(_, sketch0, p))
    val answer = summarize(blocks) - shift

    IslaResult(answer, pre.sketch0, pre.sigma, rate, m, shift, blocks)
  }

  /** Summarization module (§II-C): Σ avg_j·|Bⱼ| / M. */
  def summarize(blocks: Seq[BlockResult]): Double = {
    val m = blocks.map(_.blockSize).sum
    require(m > 0, "no data behind the partial answers")
    blocks.map(b => b.avg * b.blockSize).sum / m
  }
}

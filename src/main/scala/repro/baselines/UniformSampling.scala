package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.Moments

/** Result of a baseline estimator: the final answer and the per-block
  * partial answers (Table IV reports partials for the comparators too).
  */
final case class BaselineResult(answer: Double, partials: Seq[(Long, Double)])

/** Uniform sampling (US, §VIII-B/F): one global Bernoulli sample, the
  * answer is the plain sample mean — every sample weighted identically,
  * which is exactly the behaviour ISLA's leverages improve on.
  */
object UniformSampling {

  /** Estimate AVG(valueCol) from a Bernoulli sample at `rate`. */
  def run(df: DataFrame, valueCol: String, rate: Double,
          blockCol: String = "block", seed: Long = 11L): BaselineResult = {
    require(rate > 0 && rate <= 1, s"rate must be in (0,1]: $rate")
    val v = col(valueCol).cast("double")
    val rows = df.where(rand(seed) < rate)
      .groupBy(col(blockCol).cast("long").as("block"))
      .agg(sum(v).as("s"), count(v).as("n"))
      .collect()
      .map(r => (r.getLong(0), r.getDouble(1), r.getLong(2)))
      .sortBy(_._1)
    val totalSum = rows.map(_._2).sum
    val totalN = rows.map(_._3).sum
    require(totalN > 0, "uniform sample came back empty — rate too small for this data size")
    // Global sample mean; partials are the per-block sample means.
    BaselineResult(totalSum / totalN, rows.map(r => (r._1, r._2 / r._3)).toSeq)
  }
}

/** Stratified sampling (STS, §VIII-B/F). The paper gives no construction
  * detail; in its blocked storage model the blocks are the natural
  * strata, so we stratify by block with proportional allocation and use
  * the textbook stratified estimator Σ (|Bⱼ|/M)·mean(sampleⱼ).
  */
object StratifiedSampling {

  /** Estimate AVG(valueCol) with block strata at per-stratum rate `rate`. */
  def run(df: DataFrame, valueCol: String, rate: Double,
          sizes: Option[Map[Long, Long]] = None,
          blockCol: String = "block", seed: Long = 13L): BaselineResult = {
    require(rate > 0 && rate <= 1, s"rate must be in (0,1]: $rate")
    val blockSizes = sizes.getOrElse(Moments.blockSizes(df, blockCol))
    val m = blockSizes.values.sum
    val v = col(valueCol).cast("double")
    val means = df.where(rand(seed) < rate)
      .groupBy(col(blockCol).cast("long").as("block"))
      .agg(avg(v).as("m"))
      .collect()
      .map(r => r.getLong(0) -> r.getDouble(1))
      .toMap
    val partials = blockSizes.keys.toSeq.sorted.map { b =>
      // A stratum whose sample is empty contributes its size with the
      // overall sampled mean (no information → no correction).
      b -> means.getOrElse(b, means.values.sum / math.max(means.size, 1))
    }
    val answer = partials.map { case (b, p) => p * blockSizes(b) }.sum / m
    BaselineResult(answer, partials)
  }
}

package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Running moments of one region's samples — the whole per-region state of
  * Algorithm 1: `param = {counter, sum, squareSum, cubeSum}`.
  *
  * Supports the online extension (§VII-A): a later round of sampling is
  * folded in with [[merge]] without revisiting earlier samples.
  */
final case class RegionMoments(n: Long, sum: Double, sum2: Double, sum3: Double) {
  /** Fold one sample in (`updateParams` of Algorithm 1). */
  def add(a: Double): RegionMoments =
    RegionMoments(n + 1, sum + a, sum2 + a * a, sum3 + a * a * a)

  /** Combine with another round's moments (online mode, §VII-A). */
  def merge(o: RegionMoments): RegionMoments =
    RegionMoments(n + o.n, sum + o.sum, sum2 + o.sum2, sum3 + o.sum3)
}

object RegionMoments {
  /** The all-zero state Algorithm 1 initializes with. */
  val empty: RegionMoments = RegionMoments(0L, 0.0, 0.0, 0.0)

  /** Moments of an explicit sample list (tests / worked examples). */
  def of(as: Seq[Double]): RegionMoments = as.foldLeft(empty)(_.add(_))
}

/** Per-block output of the sampling phase: block size plus S and L moments. */
final case class BlockMoments(block: Long, blockSize: Long, s: RegionMoments, l: RegionMoments)

/** Algorithm 1 (sampling phase) as a single Spark aggregation.
  *
  * Samples are drawn per block by a Bernoulli filter `rand(seed) < r`
  * (the distributed equivalent of drawing `m = r·|Bⱼ|` uniform samples),
  * classified by the [[Boundaries]], and folded into the S/L moments with
  * a conditional aggregate — no sample is ever materialized, matching the
  * paper's "drop a" (Algorithm 1, line 12).
  */
object Moments {

  /** Exact block sizes `|Bⱼ|` (the paper reads these from metadata;
    * one count pass stands in for the metadata lookup).
    */
  def blockSizes(df: DataFrame, blockCol: String = "block"): Map[Long, Long] =
    df.groupBy(col(blockCol)).count()
      .collect()
      .map(r => r.getLong(0) -> r.getLong(1))
      .toMap

  /** Run the sampling phase over every block in one Spark job.
    *
    * @param df       input data with a value column and a block-id column
    * @param valueCol name of the (numeric) aggregation column
    * @param rate     per-block Bernoulli sampling rate r
    * @param bounds   data boundaries fixing the S and L regions
    * @param sizes    block sizes |Bⱼ| (from [[blockSizes]] or metadata)
    * @param seed     RNG seed for the Bernoulli draw
    * @return per-block S/L moments, keyed by block id
    */
  def collect(
      df: DataFrame,
      valueCol: String,
      rate: Double,
      bounds: Boundaries,
      sizes: Map[Long, Long],
      blockCol: String = "block",
      seed: Long = 42L,
  ): Seq[BlockMoments] = {
    require(rate > 0 && rate <= 1, s"sampling rate must be in (0,1]: $rate")
    val v = col(valueCol).cast("double")
    val inS = bounds.isSCol(v)
    val inL = bounds.isLCol(v)
    val zeroL = lit(0L); val zeroD = lit(0.0)
    val rows = df
      .where(rand(seed) < rate)
      .groupBy(col(blockCol).cast("long").as("block"))
      .agg(
        sum(when(inS, 1L).otherwise(zeroL)).as("s_n"),
        sum(when(inS, v).otherwise(zeroD)).as("s_sum"),
        sum(when(inS, v * v).otherwise(zeroD)).as("s_sum2"),
        sum(when(inS, v * v * v).otherwise(zeroD)).as("s_sum3"),
        sum(when(inL, 1L).otherwise(zeroL)).as("l_n"),
        sum(when(inL, v).otherwise(zeroD)).as("l_sum"),
        sum(when(inL, v * v).otherwise(zeroD)).as("l_sum2"),
        sum(when(inL, v * v * v).otherwise(zeroD)).as("l_sum3"),
      )
      .collect()
    val byBlock = rows.map { r =>
      val b = r.getLong(0)
      b -> BlockMoments(
        block = b,
        blockSize = sizes.getOrElse(b, 0L),
        s = RegionMoments(r.getLong(1), r.getDouble(2), r.getDouble(3), r.getDouble(4)),
        l = RegionMoments(r.getLong(5), r.getDouble(6), r.getDouble(7), r.getDouble(8)),
      )
    }.toMap
    // Blocks whose entire sample missed S∪L (or yielded no sample at all)
    // still exist and must appear with empty moments.
    sizes.keys.toSeq.sorted.map { b =>
      byBlock.getOrElse(b, BlockMoments(b, sizes(b), RegionMoments.empty, RegionMoments.empty))
    }
  }

  /** Driver-side reference implementation of Algorithm 1 over explicit
    * samples — used by tests to pin the Spark aggregation's semantics.
    */
  def fromSamples(samples: Seq[Double], bounds: Boundaries): (RegionMoments, RegionMoments) =
    samples.foldLeft((RegionMoments.empty, RegionMoments.empty)) { case ((s, l), a) =>
      if (bounds.isS(a)) (s.add(a), l)
      else if (bounds.isL(a)) (s, l.add(a))
      else (s, l) // "Drop a" — TS, N, TL samples leave no trace
    }
}

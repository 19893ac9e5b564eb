package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.{Boundaries, IslaParams, Moments, PreEstimation, Region}

/** The measure-biased comparators of §VIII-C, re-implemented from the
  * paper's definitions (the sample+seek originals are closed source).
  *
  * MV  — "probabilities on values": uniform samples re-weighted by
  *       Eq. 4, prob(a) = a/Σa′, so the AVG estimate collapses to
  *       Σa²/Σa over the sample. On N(μ,σ²) this converges to
  *       (μ²+σ²)/μ — the ≈104 signature of Table III.
  *
  * MVB — "probabilities on values and boundaries": samples are split by
  *       the paper's data boundaries (all five regions); each region's
  *       probability mass is n_reg/m (∝ its sample count) and is spread
  *       within the region ∝ value, giving
  *       answer = Σ_reg (n_reg/m)·(Σ_reg a²/Σ_reg a).
  *       MVB therefore needs the same pre-estimation pass as ISLA to fix
  *       sketch₀ and σ for the boundaries.
  */
object MeasureBiased {

  /** MV: measure-biased re-weighting on values only. */
  def runMV(df: DataFrame, valueCol: String, rate: Double,
            blockCol: String = "block", seed: Long = 17L): BaselineResult = {
    require(rate > 0 && rate <= 1, s"rate must be in (0,1]: $rate")
    val v = col(valueCol).cast("double")
    val rows = df.where(rand(seed) < rate)
      .groupBy(col(blockCol).cast("long").as("block"))
      .agg(sum(v).as("s"), sum(v * v).as("s2"), count(v).as("n"))
      .collect()
      .map(r => (r.getLong(0), r.getDouble(1), r.getDouble(2), r.getLong(3)))
      .sortBy(_._1)
    require(rows.nonEmpty, "MV sample came back empty")
    val partials = rows.map { case (b, s, s2, _) => (b, if (s == 0) 0.0 else s2 / s) }.toSeq
    val totalN = rows.map(_._4).sum
    val answer = rows.map { case (_, s, s2, n) =>
      (if (s == 0) 0.0 else s2 / s) * n
    }.sum / totalN
    BaselineResult(answer, partials)
  }

  /** MVB: measure-biased re-weighting on values and data boundaries.
    *
    * Runs its own pre-estimation (pilot σ and sketch₀) to build the same
    * boundaries ISLA uses, then one grouped pass collecting per-region
    * {n, Σa, Σa²} for each block.
    */
  def runMVB(df: DataFrame, valueCol: String, rate: Double,
             p: IslaParams = IslaParams(),
             sizes: Option[Map[Long, Long]] = None,
             blockCol: String = "block", seed: Long = 19L): BaselineResult = {
    require(rate > 0 && rate <= 1, s"rate must be in (0,1]: $rate")
    val blockSizes = sizes.getOrElse(Moments.blockSizes(df, blockCol))
    val m = blockSizes.values.sum
    val pre = PreEstimation.run(df, valueCol, m, p, seed)
    val bounds = Boundaries(pre.sketch0, pre.sigma, p.p1, p.p2)

    val v = col(valueCol).cast("double")
    val rows = df.where(rand(seed + 2) < rate)
      .groupBy(col(blockCol).cast("long").as("block"), bounds.regionCol(v).as("region"))
      .agg(count(v).as("n"), sum(v).as("s"), sum(v * v).as("s2"))
      .collect()
      .map(r => (r.getLong(0), r.getString(1), r.getLong(2), r.getDouble(3), r.getDouble(4)))

    val byBlock = rows.groupBy(_._1)
    val partials = byBlock.keys.toSeq.sorted.map { b =>
      val regs = byBlock(b)
      val mB = regs.map(_._3).sum.toDouble
      // Σ_reg (n_reg/m)·(Σa²/Σa); an all-zero region contributes nothing.
      val est = regs.map { case (_, _, n, s, s2) =>
        if (s == 0) 0.0 else (n / mB) * (s2 / s)
      }.sum
      (b, est)
    }
    val totalN = rows.map(_._3).sum.toDouble
    val answer = byBlock.keys.toSeq.sorted.map { b =>
      val nB = byBlock(b).map(_._3).sum
      partials.find(_._1 == b).get._2 * nB
    }.sum / totalN
    BaselineResult(answer, partials)
  }

  /** Driver-side reference MVB estimate over explicit samples (tests). */
  def mvbOf(samples: Seq[Double], bounds: Boundaries): Double = {
    val m = samples.size.toDouble
    require(m > 0, "empty sample")
    Region.all.map { reg =>
      val in = samples.filter(a => bounds.classify(a) == reg)
      val s = in.sum
      if (s == 0) 0.0 else (in.size / m) * (in.map(a => a * a).sum / s)
    }.sum
  }
}

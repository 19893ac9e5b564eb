package repro.core

/** Leverage math of §IV and Appendix A: original leverages, the two
  * normalization constraints, re-weighted probabilities, and the closed
  * form `μ̂ = f(α) = kα + c` of Theorem 3.
  *
  * Two implementations are provided on purpose:
  *  - [[kc]] computes (k, c) from the O(1) region moments — the production
  *    path used by Algorithm 2 (no samples stored, sequence-insensitive);
  *  - [[Explicit]] walks the appendix's 5 steps over explicit sample
  *    lists — the test path that cross-validates Theorem 3 and reproduces
  *    the paper's worked example (Table II).
  */
object Leverage {

  /** Coefficients of the l-estimator `μ̂ = kα + c`. */
  final case class LinearForm(k: Double, c: Double) {
    /** Evaluate the l-estimator at leverage degree α. */
    def muHat(alpha: Double): Double = k * alpha + c
  }

  /** Theorem 3: (k, c) from the S and L moments and the leverage
    * allocating parameter q.
    *
    * c = (Σx+Σy)/(u+v) — the plain uniform answer over S∪L samples.
    * k = (TΣx − Σx³)/((1 + v/(qu))(uT − Σx²)) + vΣy³/((qu+v)Σy²) − c,
    * with T = Σx² + Σy².
    *
    * Requires u>0, v>0 and positive square sums (the paper's positivity
    * assumption; negative data are shifted first, see [[repro.core.Isla]]).
    */
  def kc(s: RegionMoments, l: RegionMoments, q: Double): LinearForm = {
    require(s.n > 0 && l.n > 0, s"Theorem 3 needs samples in both regions: |S|=${s.n} |L|=${l.n}")
    require(q > 0, s"q must be positive: $q")
    val u = s.n.toDouble
    val v = l.n.toDouble
    val t = s.sum2 + l.sum2
    require(t > 0 && l.sum2 > 0, s"square sums must be positive: T=$t ΣY²=${l.sum2}")
    val c = (s.sum + l.sum) / (u + v)
    val denomS = (1.0 + v / (q * u)) * (u * t - s.sum2)
    require(denomS != 0.0, "degenerate S region (u·T == Σx²)")
    val termS = (t * s.sum - s.sum3) / denomS
    val termL = (v * l.sum3) / ((q * u + v) * l.sum2)
    LinearForm(termS + termL - c, c)
  }

  /** Appendix-A reference path over explicit samples.
    *
    * @param xs S samples, @param ys L samples, @param q leverage allocator
    */
  final case class Explicit(xs: Seq[Double], ys: Seq[Double], q: Double) {
    require(xs.nonEmpty && ys.nonEmpty, "need samples in both S and L")
    private val u = xs.size.toDouble
    private val v = ys.size.toDouble
    /** T = Σx² + Σy². */
    val t: Double = xs.map(x => x * x).sum + ys.map(y => y * y).sum
    private val sumX2 = xs.map(x => x * x).sum
    private val sumY2 = ys.map(y => y * y).sum

    /** Step 1 — original leverage scores: 1−x²/T for S, y²/T for L. */
    def originalLeverageS(x: Double): Double = 1.0 - x * x / t
    def originalLeverageL(y: Double): Double = y * y / t

    /** Theoretical leverage mass of each region under Constraints 1+2:
      * levSum_S/levSum_L = q·u/v and levSum_S + levSum_L = 1.
      */
    val theoreticalSumS: Double = q * u / (q * u + v)
    val theoreticalSumL: Double = v / (q * u + v)

    /** Step 2 — normalization factors (appendix formulas). */
    val facX: Double = (u + v / q) * (1.0 - sumX2 / (u * t))
    val facY: Double = (q * u / v + 1.0) * (sumY2 / t)

    /** Step 3 — normalized leverages. */
    def leverageS(x: Double): Double = originalLeverageS(x) / facX
    def leverageL(y: Double): Double = originalLeverageL(y) / facY

    /** Step 4 — re-weighted probability at leverage degree α (Eq. 2),
      * with uniform probability 1/(u+v).
      */
    def probS(x: Double, alpha: Double): Double = alpha * leverageS(x) + (1.0 - alpha) / (u + v)
    def probL(y: Double, alpha: Double): Double = alpha * leverageL(y) + (1.0 - alpha) / (u + v)

    /** Step 5 — the l-estimator μ̂(α) = Σx·prob + Σy·prob. */
    def muHat(alpha: Double): Double =
      xs.map(x => x * probS(x, alpha)).sum + ys.map(y => y * probL(y, alpha)).sum

    /** Sum of all normalized leverages — must be 1 (Theorem 2). */
    def leverageSum: Double = xs.map(leverageS).sum + ys.map(leverageL).sum

    /** Sum of all probabilities at α — must be 1 for any α. */
    def probabilitySum(alpha: Double): Double =
      xs.map(probS(_, alpha)).sum + ys.map(probL(_, alpha)).sum
  }
}

package repro.core

/** Sampling-rate machinery of the Pre-estimation module (§III-A, Eq. 1).
  *
  * For a desired precision `e` at confidence `β`, the confidence interval
  * `(z̄ − uσ/√m, z̄ + uσ/√m)` of Definition 1 must have half-width `e`,
  * giving the required sample size `m = u²σ²/e²` and rate `r = m/M`.
  */
object SampleSize {

  /** Required sample size `m = u²σ²/e²` (Eq. 1, numerator).
    *
    * @param sigma estimated standard deviation of the data
    * @param e     desired precision (confidence-interval half width)
    * @param beta  confidence level in (0,1)
    */
  def sampleSize(sigma: Double, e: Double, beta: Double): Long = {
    require(sigma >= 0, s"sigma must be non-negative, got $sigma")
    require(e > 0, s"precision must be positive, got $e")
    val u = Gaussian.twoSidedQuantile(beta)
    math.max(1L, math.ceil(u * u * sigma * sigma / (e * e)).toLong)
  }

  /** Sampling rate `r = u²σ²/(M e²)` (Eq. 1), capped at 1. */
  def samplingRate(sigma: Double, e: Double, beta: Double, dataSize: Long): Double = {
    require(dataSize > 0, s"data size must be positive, got $dataSize")
    math.min(1.0, sampleSize(sigma, e, beta).toDouble / dataSize)
  }
}

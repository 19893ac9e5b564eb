package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for Eq. 1: m = u²σ²/e², r = m/M. */
class SampleSizeSpec extends AnyFunSuite {

  test("paper default regime: σ=20, e=0.1, β=0.95 gives m ≈ 153 658") {
    // m = 1.959964² · 400 / 0.01 = 153 658.3…
    val m = SampleSize.sampleSize(20.0, 0.1, 0.95)
    assert(m >= 153650 && m <= 153670, s"m=$m")
  }

  test("Table V regime: σ=20, e=0.5, β=0.95 gives m ≈ 6147") {
    val m = SampleSize.sampleSize(20.0, 0.5, 0.95)
    assert(m >= 6140 && m <= 6150, s"m=$m")
  }

  test("sample size is inversely quadratic in precision") {
    val m1 = SampleSize.sampleSize(20.0, 0.1, 0.95)
    val m2 = SampleSize.sampleSize(20.0, 0.2, 0.95)
    assert(math.abs(m1.toDouble / m2 - 4.0) < 0.01)
  }

  test("sample size is quadratic in sigma") {
    val m1 = SampleSize.sampleSize(10.0, 0.1, 0.95)
    val m2 = SampleSize.sampleSize(20.0, 0.1, 0.95)
    assert(math.abs(m2.toDouble / m1 - 4.0) < 0.01)
  }

  test("sample size grows with confidence (Fig. 6b mechanism)") {
    val ms = Seq(0.8, 0.9, 0.95, 0.98, 0.99).map(SampleSize.sampleSize(20.0, 0.1, _))
    assert(ms == ms.sorted && ms.distinct.size == ms.size, s"ms=$ms")
  }

  test("zero sigma degenerates to a single sample") {
    assert(SampleSize.sampleSize(0.0, 0.1, 0.95) == 1L)
  }

  test("sampling rate is m/M") {
    val m = SampleSize.sampleSize(20.0, 0.1, 0.95)
    val r = SampleSize.samplingRate(20.0, 0.1, 0.95, 10000000L)
    assert(math.abs(r - m.toDouble / 10000000L) < 1e-12)
  }

  test("sampling rate is independent of data size in absolute samples (§VIII-A)") {
    val mA = SampleSize.samplingRate(20.0, 0.1, 0.95, 1000000L) * 1000000L
    val mB = SampleSize.samplingRate(20.0, 0.1, 0.95, 100000000L) * 100000000L
    assert(math.abs(mA - mB) < 1e-6)
  }

  test("sampling rate caps at 1 when m exceeds M") {
    assert(SampleSize.samplingRate(57.2, 0.1, 0.95, 1000L) == 1.0)
  }

  test("precision must be positive") {
    intercept[IllegalArgumentException](SampleSize.sampleSize(20.0, 0.0, 0.95))
    intercept[IllegalArgumentException](SampleSize.sampleSize(20.0, -1.0, 0.95))
  }

  test("sigma must be non-negative") {
    intercept[IllegalArgumentException](SampleSize.sampleSize(-1.0, 0.1, 0.95))
  }

  test("data size must be positive") {
    intercept[IllegalArgumentException](SampleSize.samplingRate(20.0, 0.1, 0.95, 0L))
  }
}

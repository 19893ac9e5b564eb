package repro.bench

import repro.exp.Tables

/** Table III — accuracy of ISLA vs MV vs MVB on ten N(100,20²) datasets
  * at desired precision e=0.1.
  *
  * Paper shape claims asserted here:
  *  - only ISLA satisfies the desired precision on average;
  *  - MV sits at the (μ²+σ²)/μ ≈ 104 signature (error ≈ 4);
  *  - MVB sits ≈ 100.5 (error ≈ 0.5);
  *  - error ordering ISLA < MVB < MV.
  */
class TableIIISpec extends BenchSpec {

  private lazy val t = Tables.tableIII(spark, benchRows)
  private def row(name: String) = t.rows.find(_._1 == name).get._2.init // drop Average col
  private val acc = 100.0

  test("Table III regenerates with paper-vs-measured output") {
    report(t, Seq(
      "ISLA : 100.003 100.003 100.058 100.064 99.9831 99.9824 99.995 100.039 100.076 100.092 | avg 100.0296",
      "MV   : 104.049 103.96  104.003 103.991 103.958 104.04  103.989 103.997 104.066 103.983 | avg 104.0036",
      "MVB  : 100.558 100.472 100.523 100.485 100.471 100.541 100.511 100.51  100.598 100.481 | avg 100.515",
    ))
    assert(t.rows.map(_._1) == Seq("ISLA", "MV", "MVB"))
  }

  test("ISLA meets the desired precision 0.1 on average (paper: avg err 0.03)") {
    assert(avgErr(row("ISLA"), acc) <= 0.1, s"ISLA errors: ${row("ISLA").map(err(_, acc))}")
  }

  test("MV lands at the ≈104 measure-bias signature (paper: 104.0)") {
    val a = row("MV").sum / 10
    assert(math.abs(a - 104.0) < 0.5, s"MV avg=$a")
  }

  test("MVB lands slightly above 100 (paper: 100.5)") {
    val a = row("MVB").sum / 10
    assert(a > 100.1 && a < 101.2, s"MVB avg=$a")
  }

  test("error ordering: ISLA < MVB < MV (paper's headline claim)") {
    val eIsla = avgErr(row("ISLA"), acc)
    val eMvb = avgErr(row("MVB"), acc)
    val eMv = avgErr(row("MV"), acc)
    assert(eIsla < eMvb && eMvb < eMv, s"ISLA=$eIsla MVB=$eMvb MV=$eMv")
  }

  test("only ISLA satisfies the precision requirement (paper: MV/MVB both fail 0.1)") {
    assert(avgErr(row("MV"), acc) > 0.1)
    assert(avgErr(row("MVB"), acc) > 0.1)
  }
}

package repro.bench

import repro.exp.Tables

/** Table IV — modulation abilities: per-block partial answers on one
  * dataset, compared with sketch₀.
  *
  * Paper shape claims: ISLA's partials hug the accurate answer (their
  * average ≈ 100.003 in the paper, i.e. sketch₀'s deviation is
  * modulated away), while MV partials sit ≈ 104 and MVB ≈ 100.5 in
  * every block — both outside sketch₀'s tight confidence interval.
  */
class TableIVSpec extends BenchSpec {

  private lazy val t = Tables.tableIV(spark, benchRows)
  private def row(name: String) = t.rows.find(_._1 == name).get._2
  private val acc = 100.0

  test("Table IV regenerates with paper-vs-measured output") {
    report(t, Seq(
      "sketch0: 99.676",
      "ISLA : 99.9253 99.9702 99.9208 100.065 100.036 99.9432 100.008 100.193 99.9573 100.016 | avg 100.003",
      "MV   : 104.067 103.949 104.082 104.082 103.987 104.028 103.931 104.117 104.006 104.238 | avg 104.049",
      "MVB  : 100.54  100.499 100.541 100.608 100.496 100.502 100.481 100.654 100.554 100.707 | avg 100.558",
    ))
  }

  test("every ISLA partial is close to the accurate answer (paper: within ±0.2)") {
    row("ISLA").init.foreach { pa =>
      assert(err(pa, acc) < 0.5, s"partial=$pa")
    }
  }

  test("the summarized ISLA answer is the size-weighted partial average") {
    val partials = row("ISLA").init
    val answer = row("ISLA").last
    // Equal-size blocks: the weighted merge is the plain average.
    assert(math.abs(answer - partials.sum / partials.size) < 1e-9)
  }

  test("MV partials all carry the ≈104 bias (paper: 103.9–104.2)") {
    row("MV").init.foreach(pa => assert(math.abs(pa - 104.0) < 1.0, s"partial=$pa"))
  }

  test("MVB partials all carry the ≈+0.5 bias (paper: 100.48–100.71)") {
    row("MVB").init.foreach(pa => assert(pa > 100.0 && pa < 101.5, s"partial=$pa"))
  }

  test("ISLA partials beat MV and MVB partials block by block on average") {
    val eIsla = avgErr(row("ISLA").init, acc)
    val eMv = avgErr(row("MV").init, acc)
    val eMvb = avgErr(row("MVB").init, acc)
    assert(eIsla < eMvb && eMvb < eMv, s"ISLA=$eIsla MVB=$eMvb MV=$eMv")
  }
}

package repro.bench

import repro.exp.Tables

/** Table V — ISLA at one third of the required sampling rate vs uniform
  * (US) and stratified (STS) sampling at the full rate, e = 0.5.
  *
  * Paper shape claims: all three methods meet the precision requirement,
  * and ISLA's answers are competitive (often better) despite using only
  * 1/3 of the samples — the headline "1/3 sample size" claim.
  */
class TableVSpec extends BenchSpec {

  private lazy val t = Tables.tableV(spark, benchRows)
  private def row(name: String) = t.rows.find(_._1 == name).get._2
  private val acc = 100.0
  private val e = 0.5

  test("Table V regenerates with paper-vs-measured output") {
    report(t, Seq(
      "ISLA : 100.158 99.8936 100.136 99.8917 100.178",
      "US   : 99.6591 99.8918 99.8675 99.7068 99.8371",
      "STS  : 99.7996 100.084 100.261 99.7332 99.1607",
    ))
    assert(t.rows.map(_._1) == Seq("ISLA", "US", "STS"))
  }

  test("ISLA meets the precision requirement with 1/3 of the samples (paper claim)") {
    assert(avgErr(row("ISLA"), acc) <= e, s"errors=${row("ISLA").map(err(_, acc))}")
  }

  test("US meets the precision requirement at the full rate") {
    assert(avgErr(row("US"), acc) <= e, s"errors=${row("US").map(err(_, acc))}")
  }

  test("STS meets the precision requirement at the full rate") {
    assert(avgErr(row("STS"), acc) <= e, s"errors=${row("STS").map(err(_, acc))}")
  }

  test("ISLA's quality is comparable to the full-rate competitors (within 2x avg error)") {
    val eIsla = avgErr(row("ISLA"), acc)
    val eBest = math.min(avgErr(row("US"), acc), avgErr(row("STS"), acc))
    assert(eIsla <= math.max(2.0 * eBest, e), s"ISLA=$eIsla best=$eBest")
  }
}

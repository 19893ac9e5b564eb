package repro.bench

import repro.exp.Tables

/** Table VII — the uniform-distribution stress case on [1, 199].
  *
  * Paper shape claims: MV is wildly off (≈132 = (μ²+σ²)/μ for
  * U[1,199]), MVB is materially biased, ISLA stays within ~0.5 of 100
  * and is by far the most robust.
  *
  * Note (EXPERIMENTS.md): under its own stated formula MVB is provably
  * ≥ the sample mean, so the paper's reported ≈93 is unreachable; our
  * principled MVB lands above 100. The ordering claim is unaffected.
  */
class TableVIISpec extends BenchSpec {

  private lazy val t = Tables.tableVII(spark, benchRows)
  private def row(name: String) = t.rows.find(_._1 == name).get._2
  private val acc = 100.0

  test("Table VII regenerates with paper-vs-measured output") {
    report(t, Seq(
      "ISLA : 99.7658 99.5098 99.5627 99.7011 99.8016",
      "MV   : 132.031 132.046 131.932 132.12  132.06",
      "MVB  : 93.5209 92.8587 93.3415 93.7927 95.3857",
    ))
  }

  test("MV lands at the ≈132 uniform signature (paper: 131.9–132.1)") {
    row("MV").foreach(v => assert(math.abs(v - 132.67) < 1.5, s"MV=$v"))
  }

  test("ISLA stays within ~1 of the accurate 100 (paper: 99.5–99.85)") {
    row("ISLA").foreach(v => assert(err(v, acc) < 1.0, s"ISLA=$v"))
  }

  test("MVB is materially biased but far better than MV (paper: |err| ≈ 6 vs 32)") {
    row("MVB").foreach { v =>
      assert(err(v, acc) > 0.5 && err(v, acc) < 15.0, s"MVB=$v")
    }
  }

  test("robustness ordering ISLA < MVB < MV on every dataset (paper's claim)") {
    row("ISLA").zip(row("MVB")).zip(row("MV")).foreach { case ((i, b), m) =>
      assert(err(i, acc) < err(b, acc), s"ISLA=$i MVB=$b")
      assert(err(b, acc) < err(m, acc), s"MVB=$b MV=$m")
    }
  }
}

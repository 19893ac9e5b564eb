package repro.bench

import repro.SparkSpec
import repro.exp.ExpTable

/** Base for the per-table benchmark suites.
  *
  * Each suite regenerates one evaluation table at container scale
  * (M = 10⁶ per dataset instead of the paper's 10¹⁰ — Eq. 1 keeps the
  * absolute sample size identical, see DESIGN.md §3), prints the
  * measured rows next to the paper's published rows, and asserts the
  * paper's *shape* claims (which method wins, by roughly what factor).
  * `sbt "bench/test"` therefore both regenerates and regression-checks
  * every table; the printed output is the source for EXPERIMENTS.md.
  */
trait BenchSpec extends SparkSpec {

  /** Rows per synthetic dataset in the benches. */
  val benchRows: Long = 1000000L

  /** Print a measured table followed by the paper's reference rows. */
  def report(measured: ExpTable, paperRows: Seq[String]): Unit = {
    println()
    println(measured.render)
    println("   --- paper (ICDE'19) reference ---")
    paperRows.foreach(l => println("   " + l))
    println()
  }

  /** Absolute error against the known accurate answer. */
  def err(v: Double, accurate: Double): Double = math.abs(v - accurate)

  /** Mean absolute error of a row against the accurate answer. */
  def avgErr(vs: Seq[Double], accurate: Double): Double =
    vs.map(err(_, accurate)).sum / vs.size
}

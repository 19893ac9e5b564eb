package repro.exp

import repro.SparkSpec
import repro.core.IslaParams

/** Smoke tests for the table harnesses at reduced scale (the bench
  * project runs them at full scale with paper-vs-measured output).
  */
class TablesSpec extends SparkSpec {

  private val small = 40000L
  private val p = IslaParams(e = 1.0)

  test("tableIII harness produces 3 method rows with per-dataset + average columns") {
    val t = Tables.tableIII(spark, small, nDatasets = 2, p)
    assert(t.rows.map(_._1) == Seq("ISLA", "MV", "MVB"))
    assert(t.header.size == 3) // ds1, ds2, Average
    t.rows.foreach { case (_, vs) =>
      assert(vs.size == 3)
      assert(math.abs(vs.last - vs.init.sum / vs.init.size) < 1e-9)
    }
  }

  test("tableIV harness reports one partial per block plus the final answer") {
    val t = Tables.tableIV(spark, small, p)
    assert(t.rows.map(_._1) == Seq("ISLA", "MV", "MVB"))
    t.rows.foreach { case (_, vs) => assert(vs.size == 11) }
    assert(t.notes.exists(_.contains("sketch0")))
  }

  test("tableV harness compares ISLA (r/3) with US and STS") {
    val t = Tables.tableV(spark, small, nDatasets = 2, e = 1.5)
    assert(t.rows.map(_._1) == Seq("ISLA", "US", "STS"))
    t.rows.foreach { case (name, vs) =>
      vs.foreach(v => assert(math.abs(v - 100.0) < 5.0, s"$name: $v"))
    }
  }

  test("tableVI harness includes the accurate row 1/γ") {
    val t = Tables.tableVI(spark, small, gammas = Seq(0.1, 0.2), p)
    assert(t.rows.map(_._1) == Seq("Accurate", "ISLA", "MV", "MVB"))
    assert(t.rows.head._2 == Seq(10.0, 5.0))
  }

  test("tableVII harness runs on uniform data") {
    val t = Tables.tableVII(spark, small, nDatasets = 2, e = 1.5)
    assert(t.rows.map(_._1) == Seq("ISLA", "MV", "MVB"))
  }

  test("dataSizeSweep returns one ISLA answer per size") {
    val t = Tables.dataSizeSweep(spark, Seq(20000L, 40000L), p)
    assert(t.rows.head._2.size == 2)
    t.rows.head._2.foreach(v => assert(math.abs(v - 100.0) < 5.0, s"v=$v"))
  }

  test("nonIid harness returns one answer per run") {
    val t = Tables.nonIid(spark, perBlock = 10000L, runs = 2, e = 1.5)
    assert(t.rows.head._2.size == 2)
  }

  test("render yields one line per row plus title and header") {
    val t = ExpTable("T", Seq("a", "b"), Seq("X" -> Seq(1.0, 2.0)), Seq("n"))
    val lines = t.render.linesIterator.toSeq
    assert(lines.size == 4)
    assert(lines.head.contains("== T =="))
    assert(lines(2).contains("1.0000") && lines(2).contains("2.0000"))
  }

  test("render prints NaN as a dash") {
    val t = ExpTable("T", Seq("a"), Seq("X" -> Seq(Double.NaN)))
    assert(t.render.contains("-"))
  }
}

package repro.jobs

import repro.exp.{Tables, Timing}

/** spark-submit entrypoints — one object per evaluation table/experiment.
  *
  * Each optional first argument overrides the per-dataset row count
  * (default 1 000 000), e.g.
  * `spark-submit --class repro.jobs.TableIII repro.jar 2000000`.
  */
object TableIII {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-table-iii")
    val rows = args.headOption.map(_.toLong).getOrElse(1000000L)
    println(Tables.tableIII(spark, rows).render)
    spark.stop()
  }
}

/** Table IV — per-block partial answers (modulation abilities). */
object TableIV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-table-iv")
    val rows = args.headOption.map(_.toLong).getOrElse(1000000L)
    println(Tables.tableIV(spark, rows).render)
    spark.stop()
  }
}

/** Table V — ISLA at one third of the uniform/stratified sample size. */
object TableV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-table-v")
    val rows = args.headOption.map(_.toLong).getOrElse(1000000L)
    println(Tables.tableV(spark, rows).render)
    spark.stop()
  }
}

/** Table VI — exponential distributions. */
object TableVI {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-table-vi")
    val rows = args.headOption.map(_.toLong).getOrElse(1000000L)
    println(Tables.tableVI(spark, rows).render)
    spark.stop()
  }
}

/** Table VII — uniform distribution on [1, 199]. */
object TableVII {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-table-vii")
    val rows = args.headOption.map(_.toLong).getOrElse(1000000L)
    println(Tables.tableVII(spark, rows).render)
    spark.stop()
  }
}

/** §VIII-A — varying data size sweep. */
object DataSize {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-datasize")
    println(Tables.dataSizeSweep(spark).render)
    spark.stop()
  }
}

/** §VIII-D — non-i.i.d. blocks. */
object NonIid {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-noniid")
    val perBlock = args.headOption.map(_.toLong).getOrElse(200000L)
    println(Tables.nonIid(spark, perBlock).render)
    spark.stop()
  }
}

/** §VIII-F — efficiency comparison on TPC-H-lite lineitem. */
object Efficiency {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-efficiency")
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    println(Timing.efficiency(spark, sf).render)
    spark.stop()
  }
}

/** §VIII-G — real-data stand-ins (salary-like, TLC-trip-like). */
object RealData {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("isla-realdata")
    Tables.realData(spark).foreach(t => println(t.render))
    spark.stop()
  }
}

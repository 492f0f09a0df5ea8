package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** spark-submit entrypoints, one per evaluation table, e.g.
  *
  *   spark-submit --class repro.jobs.Table2a target/scala-2.13/repro_*.jar
  *
  * Each prints the reproduced table rows (with the paper's numbers
  * inline) and exits non-zero if a shape check fails.
  */
object JobUtil {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def emit(out: TableOutput): Unit = {
    println(s"\n== ${out.title} ==")
    out.lines.foreach(println)
    out.checks.foreach { case (n, ok) => println(s"  [${if (ok) "ok" else "FAIL"}] $n") }
    if (out.failed.nonEmpty) sys.exit(1)
  }
}

object Table2a { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table2a(JobUtil.session("table2a"))) }
object Table2b { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table2b(JobUtil.session("table2b"))) }
object Table2c { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table2c(JobUtil.session("table2c"))) }
object Table3  { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table3(JobUtil.session("table3"))) }
object Table4a { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table4a(JobUtil.session("table4a"))) }
object Table4b { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table4b(JobUtil.session("table4b"))) }
object Table4c { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table4c(JobUtil.session("table4c"))) }
object Table4d { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table4d(JobUtil.session("table4d"))) }
object Table5  { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table5(JobUtil.session("table5"))) }
object Table6  { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table6(JobUtil.session("table6"))) }
object Table7  { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table7(JobUtil.session("table7"))) }
object Table8  { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table8(JobUtil.session("table8"))) }
object Table9  { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table9(JobUtil.session("table9"))) }
object Table12 { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table12(JobUtil.session("table12"))) }
object Table15 { def main(a: Array[String]): Unit = JobUtil.emit(Tables.table15(JobUtil.session("table15"))) }
object Table16 { def main(a: Array[String]): Unit = JobUtil.emit(TablesSpecial.table16(JobUtil.session("table16"))) }

/** Runs every table back to back (the full evaluation section). */
object AllTables {
  def main(a: Array[String]): Unit = {
    val spark = JobUtil.session("all-tables")
    val outs = Seq(
      Tables.table2a(spark), Tables.table2b(spark), Tables.table2c(spark),
      Tables.table3(spark), Tables.table4a(spark), Tables.table4b(spark),
      Tables.table4c(spark), Tables.table4d(spark),
      TablesSpecial.table5(spark), TablesSpecial.table6(spark),
      TablesSpecial.table7(spark), TablesSpecial.table8(spark),
      TablesSpecial.table9(spark), TablesSpecial.table12(spark),
      Tables.table15(spark), TablesSpecial.table16(spark))
    outs.foreach(JobUtil.emit)
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.TableOutput

/** Base for the per-table benchmark suites: prints the reproduced table
  * (paper numbers inline) and asserts its shape checks.
  */
abstract class TableBench extends SparkSpec {
  def emit(out: TableOutput): Unit = {
    println(s"\n== ${out.title} ==")
    out.lines.foreach(println)
    out.checks.foreach { case (n, ok) =>
      println(s"  [${if (ok) "ok" else "FAIL"}] $n")
    }
    assert(out.failed.isEmpty, s"shape checks failed: ${out.failed.mkString("; ")}")
  }
}

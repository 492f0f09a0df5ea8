package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided TPC-H-lite generators (unused by the
  * band-join workloads, but part of the shared substrate).
  */
class SynthDataTest extends SparkSpec {

  test("lineitem: schema and deterministic generation") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    assert(a.columns.contains("l_orderkey") && a.columns.contains("l_shipdate"))
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.except(b).count() == 0)
  }

  test("orders join customer keys are within range") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val nCust = c.count()
    assert(o.filter(col("o_custkey") > nCust).count() == 0)
  }

  test("part: unique keys, bounded sizes") {
    val p = SynthData.part(spark, sf = 0.001)
    assert(p.select("p_partkey").distinct().count() == p.count())
    assert(p.filter(col("p_size") < 1 || col("p_size") > 51).count() == 0)
  }

  test("zipfKeys is skewed: top key far above uniform share") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val top = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(top > 3 * 20000 / 1000, s"top key count $top not skewed")
  }

  test("uniformKeys covers the key range roughly evenly") {
    val u = SynthData.uniformKeys(spark, 20000, 100)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length > 90)
    assert(counts.max < 5 * counts.min)
  }

  test("oracle cross-check: lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
      .select("l_returnflag", "l_quantity")
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }
}

package repro.data

import repro.SparkSpec
import org.apache.spark.sql.functions._

class BandSynthTest extends SparkSpec {

  test("pareto: all values >= 1 and deterministic in the seed") {
    val a = BandSynth.pareto(spark, 1000, 1.5, 2, 1)
    val b = BandSynth.pareto(spark, 1000, 1.5, 2, 1)
    assert(a.agg(min("a1")).collect()(0).getDouble(0) >= 1.0)
    assert(a.except(b).count() == 0 && b.except(a).count() == 0)
  }

  test("pareto: ids are unique and count matches") {
    val df = BandSynth.pareto(spark, 500, 1.0, 1, 2)
    assert(df.count() == 500)
    assert(df.select("id").distinct().count() == 500)
  }

  test("pareto: higher z concentrates more mass near 1") {
    def below2(z: Double): Long =
      BandSynth.pareto(spark, 5000, z, 1, 3).filter(col("a1") < 2.0).count()
    // P(X < 2) = 1 - 2^-z: z=0.5 → 0.29, z=2 → 0.75
    assert(below2(2.0) > below2(0.5) + 1000)
  }

  test("pareto CDF approximately matches 1 - x^-z") {
    val z = 1.5
    val n = 20000L
    val df = BandSynth.pareto(spark, n, z, 1, 4)
    for (x <- Seq(1.5, 2.0, 4.0)) {
      val frac = df.filter(col("a1") <= x).count().toDouble / n
      val expect = 1 - math.pow(x, -z)
      assert(math.abs(frac - expect) < 0.02, s"CDF($x): $frac vs $expect")
    }
  }

  test("pareto quantization snaps to the lattice") {
    val q = 0.01
    val df = BandSynth.pareto(spark, 500, 1.5, 1, 5, quantize = q)
    val bad = df.filter(abs(col("a1") / q - round(col("a1") / q)) > 1e-6).count()
    assert(bad == 0)
  }

  test("quantized pareto has exact duplicates (nonzero equi-join)") {
    val df = BandSynth.pareto(spark, 2000, 1.5, 1, 6, quantize = 0.01)
    assert(df.select("a1").distinct().count() < 2000)
  }

  test("rvPareto mirrors toward 1e6") {
    val df = BandSynth.rvPareto(spark, 1000, 1.5, 1, 7)
    val mx = df.agg(max("a1")).collect()(0).getDouble(0)
    assert(mx <= 1e6 - 1.0 + 1e-9)
    val frac = df.filter(col("a1") > 1e6 - 2).count().toDouble / 1000
    assert(frac > 0.5, "mass must concentrate near 1e6")
  }

  test("ebird stays within geographic bounds") {
    val df = BandSynth.ebird(spark, 2000, 8)
    assert(df.filter(col("a2") < -90 || col("a2") > 90).count() == 0)
    assert(df.filter(col("a3") < -180 || col("a3") > 180).count() == 0)
    assert(df.filter(col("a1") < 0 || col("a1") > 4000).count() == 0)
  }

  test("ebird is clustered: hotspots repeat") {
    val df = BandSynth.ebird(spark, 3000, 9, hotspots = 20)
    // rounding to 3 degrees must leave far fewer than 3000 distinct spots
    val spots = df.select(round(col("a2") / 3), round(col("a3") / 3)).distinct().count()
    assert(spots < 500, s"got $spots distinct coarse cells")
  }

  test("cloud covers a regular station grid") {
    val df = BandSynth.cloud(spark, 3000, 10)
    assert(df.filter(col("a2") < -66 || col("a2") > 86).count() == 0)
    val stations = df.select(floor(col("a2")), floor(col("a3"))).distinct().count()
    assert(stations > 500, "stations must spread broadly")
  }

  test("ebird and cloud overlap spatially (joinable)") {
    import repro.core.{BandSpec, LocalJoin}
    val e = BandSynth.ebird(spark, 800, 11).collect().map(r => Array(r.getDouble(1), r.getDouble(2), r.getDouble(3)))
    val c = BandSynth.cloud(spark, 800, 12).collect().map(r => Array(r.getDouble(1), r.getDouble(2), r.getDouble(3)))
    val n = LocalJoin.countMatches(e, c, BandSpec(Array(50.0, 5.0, 5.0)))
    assert(n > 0)
  }

  test("ptf: two tables share the object population") {
    val a = BandSynth.ptf(spark, 3000, 13)
    val b = BandSynth.ptf(spark, 3000, 14)
    import repro.core.{BandSpec, LocalJoin}
    val pa = a.collect().map(r => Array(r.getDouble(1), r.getDouble(2)))
    val pb = b.collect().map(r => Array(r.getDouble(1), r.getDouble(2)))
    val eps = 2.78e-4 // 1 arcsecond
    val matches = LocalJoin.countMatches(pa, pb, BandSpec(Array(eps, eps)))
    assert(matches > 100, s"repeat detections expected, got $matches")
  }

  test("ptf coordinates in range") {
    val df = BandSynth.ptf(spark, 1000, 15)
    assert(df.filter(col("a1") < -1 || col("a1") > 361).count() == 0)
    assert(df.filter(col("a2") < -86 || col("a2") > 86).count() == 0)
  }

  test("dims helper") {
    assert(BandSynth.dims(3) == Seq("a1", "a2", "a3"))
  }
}

package repro.core

import repro.{SparkSpec, TestData}

class SamplesTest extends SparkSpec {

  test("samplePoints caps at k and weights sum to the input size") {
    val df = TestData.randomDf(spark, 1000, 2, 1)
    val (pts, total) = Samples.samplePoints(df, Seq("a1", "a2"), 100, 5)
    assert(total == 1000)
    assert(pts.length <= 100 && pts.length > 10)
    assert(math.abs(pts.map(_.weight).sum - 1000.0) < 1e-6)
  }

  test("samplePoints takes everything when k exceeds the input") {
    val df = TestData.randomDf(spark, 50, 1, 2)
    val (pts, total) = Samples.samplePoints(df, Seq("a1"), 500, 5)
    assert(total == 50 && pts.length == 50)
    assert(pts.forall(_.weight == 1.0))
  }

  test("empty input yields an empty sample") {
    val df = TestData.randomDf(spark, 10, 1, 3).filter("a1 > 100")
    val (pts, total) = Samples.samplePoints(df, Seq("a1"), 10, 5)
    assert(total == 0 && pts.isEmpty)
  }

  test("samplePairs output estimate is within 2x of the truth on uniform data") {
    val s = TestData.randomDf(spark, 2000, 1, 4).cache()
    val t = TestData.randomDf(spark, 2000, 1, 5).cache()
    val band = BandSpec(Array(0.2))
    val js = Samples.draw(s, t, Seq("a1"), band, 1600, 4000, seed = 6)
    // truth: P(|u - v| <= 0.2) with u,v ~ U[0,10] is about 0.0396
    val truth = 2000.0 * 2000.0 * 0.0396
    assert(js.outputEstimate > truth / 2 && js.outputEstimate < truth * 2,
      s"estimate ${js.outputEstimate} vs truth $truth")
  }

  test("pair subsampling rescales weights to stay unbiased") {
    val s = TestData.randomDf(spark, 500, 1, 7).cache()
    val t = TestData.randomDf(spark, 500, 1, 8).cache()
    val band = BandSpec(Array(1.0))
    val big = Samples.draw(s, t, Seq("a1"), band, 600, 100000, seed = 9)
    val small = Samples.draw(s, t, Seq("a1"), band, 600, 50, seed = 9)
    assert(small.pairs.length <= 50)
    val ratio = small.outputEstimate / big.outputEstimate
    assert(ratio > 0.99 && ratio < 1.01, s"subsampling biased the estimate: $ratio")
  }

  test("draw records exact input counts") {
    val s = TestData.randomDf(spark, 321, 1, 10)
    val t = TestData.randomDf(spark, 123, 1, 11)
    val js = Samples.draw(s, t, Seq("a1"), BandSpec(Array(0.1)), 100, 100)
    assert(js.sCount == 321 && js.tCount == 123)
  }

  test("sampling is deterministic in the seed") {
    val s = TestData.randomDf(spark, 400, 1, 12).cache()
    val (p1, _) = Samples.samplePoints(s, Seq("a1"), 50, 42)
    val (p2, _) = Samples.samplePoints(s, Seq("a1"), 50, 42)
    assert(p1.map(_.x(0)).toSeq == p2.map(_.x(0)).toSeq)
  }

  test("integer join columns are cast to double points") {
    import spark.implicits._
    val df = spark.range(100).selectExpr("id", "cast(id % 10 as int) as a1")
    val (pts, _) = Samples.samplePoints(df, Seq("a1"), 1000, 1)
    assert(pts.forall(p => p.x(0) == math.floor(p.x(0))))
  }
}

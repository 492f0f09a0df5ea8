package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.BandSpec
import repro.data.BandSynth

/** Helpers to build small input DataFrames (id + a1..ad) for tests. */
object TestData {

  def df(spark: SparkSession, pts: Seq[(Long, Array[Double])]): DataFrame = {
    val d = pts.head._2.length
    val rows = pts.map { case (id, x) => org.apache.spark.sql.Row.fromSeq(id +: x.toSeq) }
    val schema = org.apache.spark.sql.types.StructType(
      org.apache.spark.sql.types.StructField("id",
        org.apache.spark.sql.types.LongType, nullable = false) +:
        (1 to d).map(i => org.apache.spark.sql.types.StructField(s"a$i",
          org.apache.spark.sql.types.DoubleType, nullable = false)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 4), schema)
  }

  def randomDf(spark: SparkSession, n: Int, d: Int, seed: Long,
               lo: Double = 0.0, hi: Double = 10.0,
               skewed: Boolean = false): DataFrame =
    df(spark, repro.core.PartitionLaws.cloud(n, d, seed, lo, hi, skewed))

  def dims(d: Int): Seq[String] = BandSynth.dims(d)

  /** Small standard instances exercised across the oracle matrix. */
  def instances(spark: SparkSession): Seq[(String, DataFrame, DataFrame, Seq[String], BandSpec)] = Seq(
    ("uniform-1d", randomDf(spark, 400, 1, 1), randomDf(spark, 400, 1, 2),
      dims(1), BandSpec(Array(0.05))),
    ("uniform-1d-eq", randomDf(spark, 300, 1, 3), randomDf(spark, 300, 1, 4),
      dims(1), BandSpec(Array(0.0))),
    ("skewed-2d", randomDf(spark, 300, 2, 5, skewed = true),
      randomDf(spark, 300, 2, 6, skewed = true), dims(2), BandSpec(Array(0.3, 0.6))),
    ("uniform-3d", randomDf(spark, 250, 3, 7), randomDf(spark, 250, 3, 8),
      dims(3), BandSpec(Array(0.5, 0.5, 0.5))),
    ("pareto-1d", BandSynth.pareto(spark, 400, 1.5, 1, 9, quantize = 0.01),
      BandSynth.pareto(spark, 400, 1.5, 1, 10, quantize = 0.01),
      dims(1), BandSpec(Array(0.02))),
    ("pareto-3d", BandSynth.pareto(spark, 300, 1.5, 3, 11),
      BandSynth.pareto(spark, 300, 1.5, 3, 12), dims(3), BandSpec(Array(1.0, 1.0, 1.0))),
    ("rv-pareto-1d", BandSynth.pareto(spark, 300, 1.5, 1, 13),
      BandSynth.rvPareto(spark, 300, 1.5, 1, 14), dims(1), BandSpec(Array(1000.0))),
    ("ebird-cloud", BandSynth.ebird(spark, 300, 15), BandSynth.cloud(spark, 250, 16),
      dims(3), BandSpec(Array(5.0, 2.0, 2.0))),
  )
}

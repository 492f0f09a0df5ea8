package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.core._

class OneBucketTest extends AnyFunSuite {

  test("forWorkers picks near-square grids") {
    val b30 = OneBucket.forWorkers(30)
    assert(b30.r * b30.c <= 30 && b30.r + b30.c == 11) // 5x6
    val b16 = OneBucket.forWorkers(16)
    assert(b16.r == 4 && b16.c == 4)
    val b1 = OneBucket.forWorkers(1)
    assert(b1.r == 1 && b1.c == 1)
  }

  test("S duplicated c times, T duplicated r times") {
    val b = OneBucket(3, 5, 15)
    assert(b.assignS(Array(1.0), 7L).length == 5)
    assert(b.assignT(Array(1.0), 7L).length == 3)
    assert(b.sMultiplicity(Array(1.0), 7L) == 5)
    assert(b.tMultiplicity(Array(1.0), 7L) == 3)
  }

  test("assignment ignores coordinates, depends only on salt") {
    val b = OneBucket(4, 4, 16)
    assert(b.assignS(Array(1.0), 5L).sameElements(b.assignS(Array(99.0), 5L)))
    assert(b.assignT(Array(2.0), 9L).sameElements(b.assignT(Array(-3.0), 9L)))
  }

  test("rows and columns are roughly uniform over many salts") {
    val b = OneBucket(5, 6, 30)
    val rows = (0L until 3000L).map(salt => b.assignS(Array(0.0), salt)(0) / 6)
    val counts = rows.groupBy(identity).values.map(_.size)
    assert(counts.size == 5)
    assert(counts.min > 3000 / 5 * 0.8 && counts.max < 3000 / 5 * 1.2)
  }

  test("exactly-once law regardless of band width") {
    for (e <- Seq(0.0, 0.5, 5.0)) {
      val band = BandSpec(Array(e))
      val b = OneBucket.forWorkers(12)
      PartitionLaws.checkAll(b, band,
        PartitionLaws.cloud(40, 1, 81), PartitionLaws.cloud(40, 1, 82))
    }
  }

  test("property: exactly-once for random grids") {
    Props.hold(Prop.forAll(Gen.choose(1, 5), Gen.choose(1, 5),
      Gen.choose(0L, 5000L)) { (r, c, seed) =>
      val band = BandSpec(Array(1.0, 1.0))
      val b = OneBucket(r, c, r * c)
      PartitionLaws.checkAll(b, band,
        PartitionLaws.cloud(20, 2, seed), PartitionLaws.cloud(20, 2, seed + 1))
      true
    }, minTests = 30)
  }

  test("each partition is its own worker") {
    val b = OneBucket(3, 4, 12)
    (0 until 12).foreach(p => assert(b.partitionWorker(p) == p))
  }

  test("rejects grids exceeding worker count") {
    assertThrows[IllegalArgumentException](OneBucket(4, 4, 12))
  }
}

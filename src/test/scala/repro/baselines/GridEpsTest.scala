package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.core._

class GridEpsTest extends AnyFunSuite {

  test("rejects zero band width") {
    assertThrows[IllegalArgumentException](GridEps(BandSpec(Array(0.0)), 4))
  }

  test("S goes to exactly one cell") {
    val g = GridEps(BandSpec(Array(1.0, 1.0)), 4)
    val a = g.assignS(Array(3.3, 7.7), 1L)
    assert(a.length == 1)
  }

  test("T copied to at most 3 cells per dimension") {
    val g = GridEps(BandSpec(Array(1.0, 1.0)), 4)
    for (p <- PartitionLaws.cloud(100, 2, 3)) {
      val m = g.tMultiplicity(p._2, p._1)
      assert(m >= 1 && m <= 9)
      assert(m == g.assignT(p._2, p._1).length)
    }
  }

  test("T exactly on a cell interior is copied to 2 cells per crossed boundary") {
    val g = GridEps(BandSpec(Array(1.0)), 4)
    // cell [0,1): value 0.5, ε-range [-0.5, 1.5] crosses 0 and 1 → 3 cells
    assert(g.tMultiplicity(Array(0.5), 0L) == 3)
  }

  test("coarser grid reduces T multiplicity") {
    val fine = GridEps(BandSpec(Array(1.0)), 4, 1.0)
    val coarse = GridEps(BandSpec(Array(1.0)), 4, 8.0)
    val pts = PartitionLaws.cloud(200, 1, 11, 0, 100)
    val mFine = pts.map(p => fine.tMultiplicity(p._2, p._1)).sum
    val mCoarse = pts.map(p => coarse.tMultiplicity(p._2, p._1)).sum
    assert(mCoarse < mFine)
  }

  test("pair is produced in the cell of s") {
    val band = BandSpec(Array(0.5, 0.5))
    val g = GridEps(band, 8)
    val s = PartitionLaws.cloud(40, 2, 21)
    val t = PartitionLaws.cloud(40, 2, 22)
    for ((sid, sx) <- s; (tid, tx) <- t if band.matches(sx, tx)) {
      assert(g.pairPartition(sx, sid, tx, tid) == g.assignS(sx, sid)(0))
    }
  }

  test("exactly-once law on uniform data (2D)") {
    val band = BandSpec(Array(0.7, 0.7))
    val g = GridEps(band, 8)
    PartitionLaws.checkAll(g, band,
      PartitionLaws.cloud(60, 2, 31), PartitionLaws.cloud(60, 2, 32))
  }

  test("exactly-once law with multiplier > 1 (3D skewed)") {
    val band = BandSpec(Array(0.4, 0.4, 0.4))
    val g = GridEps(band, 8, 3.0)
    PartitionLaws.checkAll(g, band,
      PartitionLaws.cloud(50, 3, 41, skewed = true),
      PartitionLaws.cloud(50, 3, 42, skewed = true))
  }

  test("exactly-once law with fractional multiplier") {
    val band = BandSpec(Array(1.0))
    val g = GridEps(band, 4, 0.5)
    PartitionLaws.checkAll(g, band,
      PartitionLaws.cloud(60, 1, 51), PartitionLaws.cloud(60, 1, 52))
  }

  test("property: exactly-once over random settings") {
    Props.hold(Prop.forAll(Gen.choose(0L, 5000L), Gen.choose(0.2, 2.0),
      Gen.choose(1, 3)) { (seed, e, mult) =>
      val band = BandSpec(Array(e, e))
      val g = GridEps(band, 5, mult.toDouble)
      PartitionLaws.checkAll(g, band,
        PartitionLaws.cloud(25, 2, seed), PartitionLaws.cloud(25, 2, seed + 1))
      true
    }, minTests = 30)
  }

  test("negative coordinates map to consistent cells") {
    val g = GridEps(BandSpec(Array(1.0)), 4)
    assert(g.coord(-0.5, 0) == -1L)
    assert(g.coord(0.5, 0) == 0L)
    PartitionLaws.checkAll(g, BandSpec(Array(1.0)),
      PartitionLaws.cloud(50, 1, 61, -10, 10), PartitionLaws.cloud(50, 1, 62, -10, 10))
  }

  test("worker hashing covers [0, w)") {
    val g = GridEps(BandSpec(Array(1.0)), 7)
    for (p <- PartitionLaws.cloud(100, 1, 71, -50, 50)) {
      val wk = g.partitionWorker(g.assignS(p._2, p._1)(0))
      assert(wk >= 0 && wk < 7)
    }
  }
}

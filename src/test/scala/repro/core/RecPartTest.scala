package repro.core

import org.scalatest.funsuite.AnyFunSuite

class RecPartTest extends AnyFunSuite {

  /** Build a JoinSample that contains the *entire* input (weight 1) —
    * the optimizer then works with exact statistics.
    */
  private def fullSample(s: Seq[Double], t: Seq[Double], band: BandSpec): JoinSample =
    fullSampleN(s.map(v => Array(v)), t.map(v => Array(v)), band)

  private def fullSampleN(s: Seq[Array[Double]], t: Seq[Array[Double]],
                          band: BandSpec): JoinSample = {
    val sp = s.map(WPoint(_, 1.0)).toArray
    val tp = t.map(WPoint(_, 1.0)).toArray
    val pairs = for {
      a <- sp; b <- tp if band.matches(a.x, b.x)
    } yield WPair(a.x, b.x, 1.0)
    JoinSample(sp, tp, pairs, s.size, t.size)
  }

  private def region(pts: Seq[Array[Double]], d: Int): Region =
    Region.bounding(pts, d)

  test("Example 2: finds a zero-duplication, balanced partitioning") {
    val sV = Seq(1.0, 2.0, 3.0, 5.0, 6.0, 8.0, 9.0, 10.0)
    val tV = Seq(1.0, 5.0, 6.0, 10.0)
    val band = BandSpec(Array(1.0))
    val sample = fullSample(sV, tV, band)
    val cfg = RecPartConfig(w = 2, symmetric = false)
    val res = RecPart.optimize(sample, Region(Array(1.0), Array(10.0)), band, cfg)
    assert(res.est.dupOverhead == 0.0, s"expected no duplication, got ${res.est}")
    assert(res.est.numPartitions >= 2)
    // splits must avoid T's ε-neighbourhoods: check no T value within ε of
    // any split boundary in the final tree
    def boundaries(n: SplitNode): Seq[Double] = n match {
      case InnerNode(_, x, _, l, r) => x +: (boundaries(l) ++ boundaries(r))
      case _ => Seq.empty
    }
    val part = res.partitioning
    // a T value at distance exactly ε from the boundary is not duplicated
    // (the left region A < x is open at x)
    for (x <- boundaries(part.root); tv <- tV)
      assert(math.abs(tv - x) >= 1.0, s"split $x duplicates T value $tv")
  }

  test("duplication (estI) is monotonically non-decreasing over iterations") {
    val rnd = new scala.util.Random(17)
    val s = Seq.fill(300)(Array(rnd.nextDouble() * 100, rnd.nextDouble() * 100))
    val t = Seq.fill(300)(Array(rnd.nextDouble() * 100, rnd.nextDouble() * 100))
    val band = BandSpec(Array(3.0, 3.0))
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, region(s ++ t, 2), band,
      RecPartConfig(w = 8, symmetric = true))
    val is = res.trajectory.map(_.estI)
    assert(is.zip(is.tail).forall { case (a, b) => b >= a - 1e-6 },
      "estI decreased during tree growth")
  }

  test("load overhead improves versus the single-partition start") {
    val rnd = new scala.util.Random(23)
    val s = Seq.fill(400)(Array(rnd.nextDouble() * 50))
    val t = Seq.fill(400)(Array(rnd.nextDouble() * 50))
    val band = BandSpec(Array(0.5))
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, region(s ++ t, 1), band,
      RecPartConfig(w = 4, symmetric = false))
    assert(res.est.loadOverhead < res.trajectory.head.loadOverhead)
  }

  test("w=1 performs no splits (variance is identically zero)") {
    val s = Seq(1.0, 2.0, 3.0, 4.0)
    val band = BandSpec(Array(0.5))
    val sample = fullSample(s, s, band)
    val res = RecPart.optimize(sample, Region(Array(1.0), Array(4.0)), band,
      RecPartConfig(w = 1))
    assert(res.iterations == 0)
    assert(res.est.numPartitions == 1)
  }

  test("small region switches to internal 1-Bucket partitioning") {
    val rnd = new scala.util.Random(31)
    // region extent 1.0 < 2ε = 4 → small everywhere from the start
    val s = Seq.fill(200)(Array(rnd.nextDouble()))
    val t = Seq.fill(200)(Array(rnd.nextDouble()))
    val band = BandSpec(Array(2.0))
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, Region(Array(0.0), Array(1.0)), band,
      RecPartConfig(w = 6, symmetric = false))
    res.partitioning.root match {
      case l: LeafNode => assert(l.r * l.c > 1, "expected internal 1-Bucket growth")
      case _ => fail("small root must stay a leaf")
    }
    assert(res.est.numPartitions > 1)
  }

  test("degenerate single-value input falls back to 1-Bucket") {
    val s = Seq.fill(100)(Array(7.0))
    val t = Seq.fill(100)(Array(7.0))
    val band = BandSpec(Array(0.0)) // equi-join, region never 'small'
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, Region(Array(7.0), Array(7.0)), band,
      RecPartConfig(w = 4))
    res.partitioning.root match {
      case l: LeafNode => assert(l.r * l.c > 1)
      case _ => fail("single-value root must stay a leaf")
    }
  }

  test("symmetric partitioning wins on reversed density (§4.2 example)") {
    val sV = Seq(21.0, 25.0, 26.0, 30.0)
    val tV = Seq(21.0, 22.0, 23.0, 25.0, 26.0, 28.0, 29.0, 30.0)
    // scale up weights to make the effect visible in load terms
    val band = BandSpec(Array(1.0))
    def bigSample(rep: Int): JoinSample = {
      val s = Seq.fill(rep)(sV).flatten
      val t = Seq.fill(rep)(tV).flatten
      fullSample(s, t, band)
    }
    val sample = bigSample(30)
    val reg = Region(Array(21.0), Array(30.0))
    val asym = RecPart.optimize(sample, reg, band, RecPartConfig(2, symmetric = false))
    val sym = RecPart.optimize(sample, reg, band, RecPartConfig(2, symmetric = true))
    assert(sym.est.estI <= asym.est.estI)
    // the symmetric tree should achieve zero duplication by splitting T
    assert(sym.est.dupOverhead == 0.0)
  }

  test("theoretical termination tracks max{dupOH, loadOH} and stops") {
    val rnd = new scala.util.Random(41)
    val s = Seq.fill(300)(Array(math.pow(rnd.nextDouble(), 2) * 30))
    val t = Seq.fill(300)(Array(math.pow(rnd.nextDouble(), 2) * 30))
    val band = BandSpec(Array(0.3))
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, region(s ++ t, 1), band,
      RecPartConfig(w = 4, termination = Termination.Theoretical))
    val objs = res.trajectory.map(_.objective)
    assert(res.est.objective == objs.min)
    assert(res.est.objective <= objs.head)
  }

  test("chosen iteration reproduces the best trajectory objective") {
    val rnd = new scala.util.Random(43)
    val s = Seq.fill(250)(Array(rnd.nextDouble() * 10, rnd.nextDouble() * 10))
    val t = Seq.fill(250)(Array(rnd.nextDouble() * 10, rnd.nextDouble() * 10))
    val band = BandSpec(Array(0.5, 0.5))
    val sample = fullSampleN(s, t, band)
    val res = RecPart.optimize(sample, region(s ++ t, 2), band, RecPartConfig(w = 6))
    assert(res.est.iter == res.chosenIteration)
    assert(res.est.objective == res.trajectory.map(_.objective).min)
  }

  test("optimizer is deterministic") {
    val rnd = new scala.util.Random(47)
    val s = Seq.fill(200)(Array(rnd.nextDouble() * 10))
    val t = Seq.fill(200)(Array(rnd.nextDouble() * 10))
    val band = BandSpec(Array(0.2))
    val sample = fullSampleN(s, t, band)
    val reg = region(s ++ t, 1)
    val a = RecPart.optimize(sample, reg, band, RecPartConfig(w = 5))
    val b = RecPart.optimize(sample, reg, band, RecPartConfig(w = 5))
    assert(a.est == b.est)
    assert(a.chosenIteration == b.chosenIteration)
  }

  test("resulting partitioning obeys the exactly-once law") {
    val rnd = new scala.util.Random(53)
    val s = Seq.fill(150)(Array(rnd.nextDouble() * 20, rnd.nextDouble() * 20))
    val t = Seq.fill(150)(Array(rnd.nextDouble() * 20, rnd.nextDouble() * 20))
    val band = BandSpec(Array(1.0, 1.0))
    val sample = fullSampleN(s, t, band)
    for (sym <- Seq(true, false)) {
      val res = RecPart.optimize(sample, region(s ++ t, 2), band,
        RecPartConfig(w = 5, symmetric = sym))
      val sTup = s.zipWithIndex.map { case (x, i) => (i.toLong, x) }
      val tTup = t.zipWithIndex.map { case (x, i) => (i.toLong + 1000, x) }
      PartitionLaws.checkAll(res.partitioning, band, sTup, tTup)
    }
  }

  test("variance prefactor is (w-1)/w^2") {
    assert(RecPart.variancePrefactor(2) == 0.25)
    assert(RecPart.variancePrefactor(1) == 0.0)
    assert(math.abs(RecPart.variancePrefactor(30) - 29.0 / 900) < 1e-12)
  }

  test("more workers yield at least as many partitions") {
    val rnd = new scala.util.Random(59)
    val s = Seq.fill(500)(Array(rnd.nextDouble() * 100))
    val t = Seq.fill(500)(Array(rnd.nextDouble() * 100))
    val band = BandSpec(Array(0.5))
    val sample = fullSampleN(s, t, band)
    val reg = region(s ++ t, 1)
    val p4 = RecPart.optimize(sample, reg, band, RecPartConfig(w = 4)).est.numPartitions
    val p16 = RecPart.optimize(sample, reg, band, RecPartConfig(w = 16)).est.numPartitions
    assert(p16 >= p4)
  }
}

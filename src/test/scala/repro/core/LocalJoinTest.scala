package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

class LocalJoinTest extends AnyFunSuite {

  private def brute(s: Array[Array[Double]], t: Array[Array[Double]],
                    band: BandSpec): Set[(Int, Int)] =
    (for (i <- s.indices; j <- t.indices if band.matches(s(i), t(j))) yield (i, j)).toSet

  test("1D join matches brute force") {
    val s = Array(1.0, 2.0, 3.0, 5.0, 6.0, 8.0, 9.0, 10.0).map(Array(_))
    val t = Array(1.0, 5.0, 6.0, 10.0).map(Array(_))
    val b = BandSpec(Array(1.0))
    assert(LocalJoin.join(s, t, b).toSet == brute(s, t, b))
  }

  test("band width zero finds only exact matches") {
    val s = Array(Array(1.0), Array(2.0), Array(2.0))
    val t = Array(Array(2.0), Array(3.0))
    val b = BandSpec(Array(0.0))
    assert(LocalJoin.join(s, t, b).toSet == Set((1, 0), (2, 0)))
  }

  test("3D join matches brute force") {
    val rnd = new scala.util.Random(5)
    val s = Array.fill(120)(Array.fill(3)(rnd.nextDouble() * 10))
    val t = Array.fill(110)(Array.fill(3)(rnd.nextDouble() * 10))
    val b = BandSpec(Array(0.7, 1.5, 0.3))
    assert(LocalJoin.join(s, t, b).toSet == brute(s, t, b))
  }

  test("empty inputs produce no pairs") {
    val b = BandSpec(Array(1.0))
    assert(LocalJoin.join(Array.empty, Array(Array(1.0)), b).isEmpty)
    assert(LocalJoin.join(Array(Array(1.0)), Array.empty, b).isEmpty)
  }

  test("countMatches agrees with join length") {
    val rnd = new scala.util.Random(7)
    val s = Array.fill(200)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val t = Array.fill(180)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val b = BandSpec(Array(0.05, 0.4))
    assert(LocalJoin.countMatches(s, t, b) == LocalJoin.join(s, t, b).length)
  }

  test("property: random 1D inputs equal brute force") {
    val gen = Gen.listOfN(40, Gen.choose(0.0, 20.0))
    Props.hold(Prop.forAll(gen, gen, Gen.choose(0.0, 3.0)) { (sv, tv, e) =>
      val s = sv.map(Array(_)).toArray
      val t = tv.map(Array(_)).toArray
      val b = BandSpec(Array(e))
      LocalJoin.join(s, t, b).toSet == brute(s, t, b)
    })
  }

  test("property: random 2D inputs equal brute force") {
    val pt = Gen.zip(Gen.choose(0.0, 10.0), Gen.choose(0.0, 10.0)).map { case (a, b) => Array(a, b) }
    Props.hold(Prop.forAll(Gen.listOfN(30, pt), Gen.listOfN(30, pt)) { (sv, tv) =>
      val b = BandSpec(Array(1.0, 0.5))
      LocalJoin.join(sv.toArray, tv.toArray, b).toSet == brute(sv.toArray, tv.toArray, b)
    })
  }

  test("lowerBound finds first index >= key") {
    val a = Array(1.0, 2.0, 2.0, 5.0)
    assert(LocalJoin.lowerBound(a, 0.0) == 0)
    assert(LocalJoin.lowerBound(a, 2.0) == 1)
    assert(LocalJoin.lowerBound(a, 2.5) == 3)
    assert(LocalJoin.lowerBound(a, 6.0) == 4)
  }

  test("duplicate values are all matched") {
    val s = Array.fill(5)(Array(3.0))
    val t = Array.fill(4)(Array(3.0))
    assert(LocalJoin.join(s, t, BandSpec(Array(0.0))).length == 20)
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

class LptTest extends AnyFunSuite {

  test("single worker receives everything") {
    val a = Lpt.assign(Array(1.0, 2.0, 3.0), 1)
    assert(a.forall(_ == 0))
  }

  test("equal loads spread evenly") {
    val a = Lpt.assign(Array.fill(6)(1.0), 3)
    assert(a.groupBy(identity).values.map(_.length).toSet == Set(2))
  }

  test("heaviest partition placed alone when possible") {
    // loads 4,1,1,1,1 on 2 workers: LPT puts 4 alone vs the four 1s
    val loads = Array(4.0, 1.0, 1.0, 1.0, 1.0)
    val a = Lpt.assign(loads, 2)
    val w = Array.fill(2)(0.0)
    loads.indices.foreach(i => w(a(i)) += loads(i))
    assert(w.max == 4.0)
  }

  test("maxLoad equals recomputed max") {
    val loads = Array(3.0, 1.0, 2.0, 2.0, 5.0)
    val a = Lpt.assign(loads, 3)
    val w = Array.fill(3)(0.0)
    loads.indices.foreach(i => w(a(i)) += loads(i))
    assert(Lpt.maxLoad(loads, 3) == w.max)
  }

  test("empty load list yields zero max load") {
    assert(Lpt.maxLoad(Array.empty, 4) == 0.0)
  }

  test("deterministic for equal inputs") {
    val loads = Array(1.0, 2.0, 3.0, 4.0, 5.0)
    assert(Lpt.assign(loads, 3).sameElements(Lpt.assign(loads, 3)))
  }

  test("property: LPT within 4/3 of the lower bound") {
    // Graham's bound: LPT makespan <= (4/3 - 1/(3w)) * OPT and
    // OPT >= max(total/w, max element).
    val gen = Gen.listOfN(20, Gen.choose(0.1, 10.0))
    Props.hold(Prop.forAll(gen, Gen.choose(1, 8)) { (ls, w) =>
      val loads = ls.toArray
      val lb = math.max(loads.sum / w, loads.max)
      Lpt.maxLoad(loads, w) <= (4.0 / 3.0) * lb + 1e-9
    })
  }

  test("property: every partition assigned exactly one worker in range") {
    val gen = Gen.listOfN(15, Gen.choose(0.0, 5.0))
    Props.hold(Prop.forAll(gen, Gen.choose(1, 6)) { (ls, w) =>
      val a = Lpt.assign(ls.toArray, w)
      a.length == ls.length && a.forall(x => x >= 0 && x < w)
    })
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropChecks
import org.scalacheck.{Gen, Prop}

class SkylineSpec extends AnyFunSuite with PropChecks {

  private def sky(pts: Seq[(Double, Double)]): Seq[(Double, Double)] =
    Skyline.of(pts)(_._1, _._2)

  test("single point is its own skyline") {
    assert(sky(Seq((1.0, 1.0))) === Seq((1.0, 1.0)))
  }

  test("strictly dominated point is removed") {
    val pts = Seq((1.0, 1.0), (2.0, 2.0))
    assert(sky(pts) === Seq((2.0, 2.0)))
  }

  test("pareto frontier of a staircase is kept whole") {
    val pts = Seq((1.0, 3.0), (2.0, 2.0), (3.0, 1.0))
    assert(sky(pts).toSet === pts.toSet)
  }

  test("weak dominance: tied in one dimension, beaten in the other → pruned") {
    val pts = Seq((1.0, 2.0), (2.0, 2.0)) // second is better in x, tied in y
    assert(sky(pts) === Seq((2.0, 2.0)))
  }

  test("duplicate points all survive") {
    val pts = Seq((1.0, 1.0), (1.0, 1.0))
    assert(sky(pts) === pts)
  }

  test("mixed example from the paper's shape: high-I/low-C and low-I/high-C both kept") {
    // loudness-like: I=0.13, C̄=1.69 ; danceability-like: I=0.04, C̄=1.7
    val pts = Seq((0.13, 1.69), (0.04, 1.7), (0.04, 0.3))
    assert(sky(pts).toSet === Set((0.13, 1.69), (0.04, 1.7)))
  }

  test("empty input gives empty skyline") {
    assert(sky(Seq.empty) === Seq.empty)
  }

  test("skyline elements are mutually non-dominating (property)") {
    val gen = Gen.listOf(Gen.zip(Gen.choose(0.0, 1.0), Gen.choose(-3.0, 3.0)))
    checkProp(Prop.forAll(gen) { pts =>
      val s = sky(pts)
      s.forall(x => !s.exists(o =>
        o._1 >= x._1 && o._2 >= x._2 && (o._1 > x._1 || o._2 > x._2)))
    })
  }

  test("every removed point is weakly dominated by some candidate (property)") {
    val gen = Gen.listOf(Gen.zip(Gen.choose(0.0, 1.0), Gen.choose(-3.0, 3.0)))
    checkProp(Prop.forAll(gen) { pts =>
      val s       = sky(pts).toSet
      val removed = pts.filterNot(s)
      removed.forall(x => pts.exists(o =>
        o._1 >= x._1 && o._2 >= x._2 && (o._1 > x._1 || o._2 > x._2)))
    })
  }

  test("skyline is idempotent (property)") {
    val gen = Gen.listOf(Gen.zip(Gen.choose(0.0, 1.0), Gen.choose(-3.0, 3.0)))
    checkProp(Prop.forAll(gen) { pts =>
      val once = sky(pts)
      sky(once).toSet == once.toSet
    })
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

/** Unit tests for the core model types. */
class ModelSpec extends AnyFunSuite {

  test("pairKey is symmetric") {
    assert(TemporalEdge.pairKey(3, 7) == TemporalEdge.pairKey(7, 3))
  }

  test("pairKey is injective on canonical pairs (property)") {
    val ids = Gen.chooseNum(0L, Int.MaxValue.toLong - 1)
    val prop = Prop.forAll(ids, ids, ids, ids) { (a, b, c, d) =>
      val k1 = TemporalEdge.pairKey(a, b)
      val k2 = TemporalEdge.pairKey(c, d)
      (k1 == k2) == (Set(a, b) == Set(c, d) || (a == b && c == d && a == c))
    }
    val result = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(500), prop)
    assert(result.passed, result.status.toString)
  }

  test("pair orders endpoints") {
    assert(TemporalEdge(9, 2, 1).pair == ((2L, 9L)))
    assert(TemporalEdge(2, 9, 1).pair == ((2L, 9L)))
  }

  test("Interval rejects inverted bounds") {
    intercept[IllegalArgumentException](Interval(5, 4))
  }

  test("Interval containment and span") {
    assert(Interval(1, 10).contains(Interval(3, 7)))
    assert(Interval(1, 10).contains(Interval(1, 10)))
    assert(!Interval(2, 10).contains(Interval(1, 10)))
    assert(Interval(3, 7).span == 4)
    assert(Interval(3, 7).length == 5)
  }

  test("Constraints default admits any span") {
    assert(Constraints.none.admitsSpan(Interval(1, 1000)))
  }

  test("Constraints maxSpan filters") {
    val c = Constraints(maxSpan = Some(3))
    assert(c.admitsSpan(Interval(5, 8)))
    assert(!c.admitsSpan(Interval(5, 9)))
  }

  test("Constraints rejects non-positive strength") {
    intercept[IllegalArgumentException](Constraints(minStrength = 0))
  }

  test("canonicalKey is order-independent") {
    val a = CoreResult(Interval(1, 2), Set(1L, 2L, 3L),
      Vector(TemporalEdge(1, 2, 1), TemporalEdge(3, 2, 2)))
    val b = CoreResult(Interval(1, 2), Set(1L, 2L, 3L),
      Vector(TemporalEdge(2, 3, 2), TemporalEdge(2, 1, 1)))
    assert(a.canonicalKey == b.canonicalKey)
  }

  test("RunStats percentage math") {
    val s = RunStats(totalCells = 200, prunedPoR = 2, prunedPoU = 100, prunedPoL = 48)
    assert(s.prunedTotal == 150)
    assert(math.abs(s.prunedPct(s.prunedTotal) - 75.0) < 1e-9)
    assert(RunStats().prunedPct(5) == 0.0)
  }
}

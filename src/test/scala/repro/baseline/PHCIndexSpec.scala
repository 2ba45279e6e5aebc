package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** Tests of the window-scoped PHC-Index (core times). */
class PHCIndexSpec extends AnyFunSuite {

  /** Reference core time, straight from the definition. */
  private def refCoreTime(es: Vector[TemporalEdge], k: Int, ts: Int, Te: Int, v: Long): Option[Int] =
    (ts to Te).find { te =>
      KCore.coreVertices(es.filter(e => e.t >= ts && e.t <= te), k).contains(v)
    }

  test("core times match the definition on the example graph") {
    val es = TestGraphs.example
    val w = Interval(1, 5)
    val idx = PHCIndex.build(es, 2, w)
    for (ts <- 1 to 5) {
      val ct = idx.coreTimes(ts)
      val verts = es.flatMap(e => Seq(e.u, e.v)).distinct
      verts.foreach { v =>
        assert(ct.get(v) == refCoreTime(es, 2, ts, 5, v), s"ts=$ts v=$v")
      }
    }
  }

  test("core times match the definition on random graphs") {
    for (seed <- 1 to 6; k <- 2 to 3) {
      val es = TestGraphs.random(seed * 181, nV = 12, nE = 70, horizon = 8)
      val w = Interval(1, 8)
      val idx = PHCIndex.build(es, k, w)
      val verts = es.flatMap(e => Seq(e.u, e.v)).distinct
      for (ts <- 1 to 8; v <- verts) {
        assert(idx.coreTimes(ts).get(v) == refCoreTime(es, k, ts, 8, v),
          s"seed=$seed k=$k ts=$ts v=$v")
      }
    }
  }

  test("core time is monotone in the anchor (later anchor, later or equal core time)") {
    for (seed <- 1 to 5) {
      val es = TestGraphs.random(seed * 191, nV = 12, nE = 80, horizon = 8)
      val idx = PHCIndex.build(es, 2, Interval(1, 8))
      val verts = es.flatMap(e => Seq(e.u, e.v)).distinct
      for (ts <- 1 to 7; v <- verts) {
        (idx.coreTimes(ts).get(v), idx.coreTimes(ts + 1).get(v)) match {
          case (Some(a), Some(b)) => assert(b >= a, s"seed=$seed ts=$ts v=$v")
          case (None, Some(_)) => fail(s"seed=$seed ts=$ts v=$v: core time appears from nothing")
          case _ => ()
        }
      }
    }
  }

  test("anchors between distinct timestamps share core times") {
    val es = Vector(
      TemporalEdge(1, 2, 2), TemporalEdge(2, 3, 5), TemporalEdge(1, 3, 5))
    val idx = PHCIndex.build(es, 2, Interval(1, 6))
    assert(idx.coreTimes(1) == idx.coreTimes(2)) // no edges at t=1
    assert(idx.coreTimes(3) == idx.coreTimes(5)) // none at 3,4
    assert(idx.coreTimes(6).isEmpty) // no distinct timestamp >= 6
  }

  test("restricting the window restricts the anchors") {
    val es = TestGraphs.random(193, nV = 12, nE = 60, horizon = 10)
    val idx = PHCIndex.build(es, 2, Interval(4, 8))
    assert(idx.numAnchors == es.map(_.t).distinct.count(t => t >= 4 && t <= 8))
  }

  test("index on a graph with no k-core is empty") {
    val path = Vector(TemporalEdge(1, 2, 1), TemporalEdge(2, 3, 2))
    val idx = PHCIndex.build(path, 2, Interval(1, 3))
    for (ts <- 1 to 3) assert(idx.coreTimes(ts).isEmpty)
    assert(idx.numEntries == 0)
  }

  test("build rejects mismatched use in IPHCQuery") {
    val idx = PHCIndex.build(TestGraphs.example, 2, Interval(1, 5))
    intercept[IllegalArgumentException](
      IPHCQuery.run(TestGraphs.example, idx, 3, Interval(1, 5)))
    intercept[IllegalArgumentException](
      IPHCQuery.run(TestGraphs.example, idx, 2, Interval(1, 4)))
  }
}

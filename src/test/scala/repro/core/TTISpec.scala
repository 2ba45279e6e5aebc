package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests of the Tightest Time Interval concept (§4.1): Theorem 2 and
  * Properties 1–3, verified by brute force on random graphs.
  */
class TTISpec extends AnyFunSuite {

  private def coreOf(es: Vector[TemporalEdge], k: Int, w: Interval): Option[CoreResult] =
    KCore.core(es.filter(e => e.t >= w.ts && e.t <= w.te), k)

  test("Theorem 2: TTI = [min timestamp, max timestamp] of the core") {
    for (seed <- 1 to 10) {
      val es = TestGraphs.random(seed * 41, nV = 15, nE = 90, horizon = 10)
      coreOf(es, 2, Interval(1, 10)).foreach { c =>
        assert(c.tti.ts == c.edges.map(_.t).min)
        assert(c.tti.te == c.edges.map(_.t).max)
        // Inducing over the TTI itself returns the identical core.
        val again = coreOf(es, 2, c.tti).get
        assert(again.canonicalKey == c.canonicalKey, s"seed=$seed")
      }
    }
  }

  test("Theorem 2: no proper subinterval of the TTI induces the same core") {
    for (seed <- 1 to 8) {
      val es = TestGraphs.random(seed * 43, nV = 12, nE = 70, horizon = 8)
      coreOf(es, 2, Interval(1, 8)).foreach { c =>
        val Interval(a, b) = c.tti
        if (a < b) {
          val left = coreOf(es, 2, Interval(a + 1, b))
          val right = coreOf(es, 2, Interval(a, b - 1))
          assert(!left.exists(_.canonicalKey == c.canonicalKey), s"seed=$seed left")
          assert(!right.exists(_.canonicalKey == c.canonicalKey), s"seed=$seed right")
        }
      }
    }
  }

  test("Property 1 (uniqueness): distinct intervals inducing the core share one TTI") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed * 47, nV = 12, nE = 70, horizon = 8)
      val w = Interval(1, 8)
      // Collect the TTI of the induced core for every subinterval; within a
      // canonical-key class, the TTI must be constant.
      val byCore = (for {
        ts <- 1 to 8; te <- ts to 8
        c <- coreOf(es, 2, Interval(ts, te))
      } yield (c.canonicalKey, c.tti)).groupBy(_._1)
      byCore.foreach { case (_, pairs) =>
        assert(pairs.map(_._2).distinct.size == 1, s"seed=$seed")
      }
      assert(w.length == 8) // silence unused warning
    }
  }

  test("Property 2 (equivalence): same TTI iff identical core") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed * 53, nV = 12, nE = 80, horizon = 8)
      val cores = for {
        ts <- 1 to 8; te <- ts to 8
        c <- coreOf(es, 2, Interval(ts, te))
      } yield c
      for (a <- cores; b <- cores) {
        assert((a.tti == b.tti) == (a.canonicalKey == b.canonicalKey), s"seed=$seed")
      }
    }
  }

  test("Property 3 (inclusion): nested intervals have nested TTIs") {
    for (seed <- 1 to 8) {
      val es = TestGraphs.random(seed * 59, nV = 14, nE = 90, horizon = 10)
      for {
        inner <- Seq(Interval(3, 7), Interval(4, 6), Interval(2, 9))
        outer = Interval(2, 9) if outer.contains(inner)
        ci <- coreOf(es, 2, inner)
        co <- coreOf(es, 2, outer)
      } assert(co.tti.contains(ci.tti), s"seed=$seed inner=$inner")
    }
  }

  test("TTI of a temporal k-core is inside the inducing interval") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed * 61, nV = 12, nE = 60, horizon = 10)
      for (ts <- 1 to 10; te <- ts to 10; c <- coreOf(es, 2, Interval(ts, te)))
        assert(Interval(ts, te).contains(c.tti))
    }
  }

  test("TEL reports the same TTI as the reference core") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed * 67, nV = 14, nE = 80, horizon = 9)
      val t = TEL.fromEdges(es)
      t.tcd(2, 2, 8)
      val exp = coreOf(es, 2, Interval(2, 8))
      assert(t.tti == exp.map(_.tti), s"seed=$seed")
    }
  }
}

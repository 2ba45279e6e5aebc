package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the Temporal Edge List data structure (§5.1). */
class TELSpec extends AnyFunSuite {

  private def tel(edges: Seq[TemporalEdge], h: Int = 1) = TEL.fromEdges(edges, h)

  test("empty TEL") {
    val t = TEL.empty()
    assert(t.isEmpty && t.numAliveEdges == 0 && t.numVertices == 0)
    assert(t.tti.isEmpty && t.snapshot().isEmpty && t.edges.isEmpty)
  }

  test("build counts edges and vertices") {
    val t = tel(TestGraphs.example)
    assert(t.numAliveEdges == 7)
    assert(t.numVertices == 5)
  }

  test("tti returns min/max timestamps (Theorem 2 machinery, O(1))") {
    assert(tel(TestGraphs.example).tti.contains(Interval(1, 5)))
    assert(tel(Vector(TemporalEdge(1, 2, 42))).tti.contains(Interval(42, 42)))
  }

  test("timestamps walk the timeline in ascending order") {
    val t = tel(Vector(TemporalEdge(1, 2, 5), TemporalEdge(2, 3, 1), TemporalEdge(1, 3, 9)))
    assert(t.timestamps == Vector(1, 5, 9))
  }

  test("edges returned in timeline order") {
    val es = Vector(TemporalEdge(1, 2, 3), TemporalEdge(2, 3, 1), TemporalEdge(1, 3, 2))
    assert(tel(es).edges.map(_.t) == Vector(1, 2, 3))
  }

  test("degree counts distinct neighbours, not parallel edges") {
    val t = tel(Vector(TemporalEdge(1, 2, 1), TemporalEdge(2, 1, 2), TemporalEdge(1, 3, 3)))
    assert(t.degreeOf(1) == 2)
    assert(t.degreeOf(2) == 1)
    assert(t.degreeOf(3) == 1)
    assert(t.degreeOf(99) == 0)
  }

  test("strengthOf reports parallel-edge counts symmetrically") {
    val t = tel(TestGraphs.multiEdge)
    assert(t.strengthOf(1, 2) == 3)
    assert(t.strengthOf(2, 1) == 3)
    assert(t.strengthOf(2, 3) == 2)
    assert(t.strengthOf(1, 3) == 1)
    assert(t.strengthOf(1, 9) == 0)
  }

  test("build rejects self-loops") {
    intercept[IllegalArgumentException](tel(Vector(TemporalEdge(4, 4, 1))))
  }

  test("addEdge rejects out-of-order timestamps") {
    val t = TEL.empty()
    t.addEdge(1, 2, 5)
    intercept[IllegalArgumentException](t.addEdge(2, 3, 4))
    t.addEdge(2, 3, 5) // equal timestamp is fine
    t.addEdge(3, 4, 6)
    assert(t.numAliveEdges == 3)
  }

  test("truncate drops head timestamps") {
    val t = tel(TestGraphs.example)
    t.truncate(3, Int.MaxValue)
    assert(t.edges.forall(_.t >= 3))
    assert(t.tti.contains(Interval(3, 5)))
  }

  test("truncate drops tail timestamps") {
    val t = tel(TestGraphs.example)
    t.truncate(Int.MinValue + 1, 2)
    assert(t.edges.forall(_.t <= 2))
    assert(t.tti.contains(Interval(1, 2)))
  }

  test("truncate to window matches filtering") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed, nV = 15, nE = 80, horizon = 20)
      val t = tel(es)
      t.truncate(5, 15)
      val expected = es.filter(e => e.t >= 5 && e.t <= 15)
      assert(t.edges.sortBy(e => (e.t, e.u, e.v)) == expected.sortBy(e => (e.t, e.u, e.v)))
    }
  }

  test("truncate to empty window empties the TEL") {
    val t = tel(TestGraphs.example)
    t.truncate(100, 200)
    assert(t.isEmpty && t.numVertices == 0 && t.tti.isEmpty)
  }

  test("truncate updates degrees") {
    val t = tel(TestGraphs.example)
    t.truncate(1, 2) // edges (1,2)@1 (2,3)@2 (1,3)@2 remain
    assert(t.degreeOf(1) == 2 && t.degreeOf(2) == 2 && t.degreeOf(3) == 2)
    assert(t.degreeOf(4) == 0 && t.degreeOf(5) == 0)
  }

  test("decompose peels low-degree vertices (example graph, [2,3])") {
    val t = tel(TestGraphs.example)
    t.truncate(2, 3)
    t.decompose(2)
    // Hand-checked: [2,3] unravels completely for k=2.
    assert(t.isEmpty)
  }

  test("decompose matches reference peeling on random graphs") {
    for (seed <- 1 to 10; k <- 1 to 4) {
      val es = TestGraphs.random(seed * 13, nV = 20, nE = 90, horizon = 15)
      val t = tel(es)
      t.decompose(k)
      val expected = KCore.core(es, k)
      (t.snapshot(), expected) match {
        case (None, None) => ()
        case (Some(got), Some(exp)) =>
          assert(got.canonicalKey == exp.canonicalKey, s"seed=$seed k=$k")
          assert(got.vertices == exp.vertices, s"seed=$seed k=$k")
          assert(got.tti == exp.tti, s"seed=$seed k=$k")
        case (got, exp) => fail(s"seed=$seed k=$k: got=$got expected=$exp")
      }
    }
  }

  test("tcd operation = truncate + decompose, matches reference") {
    for (seed <- 1 to 8) {
      val es = TestGraphs.random(seed * 7, nV = 16, nE = 70, horizon = 12)
      val t = tel(es)
      t.tcd(2, 4, 9)
      val exp = KCore.core(es.filter(e => e.t >= 4 && e.t <= 9), 2)
      assert(t.snapshot().map(_.canonicalKey) == exp.map(_.canonicalKey), s"seed=$seed")
    }
  }

  test("decompose leaves all degrees >= k") {
    for (seed <- 1 to 6) {
      val es = TestGraphs.random(seed * 3 + 1, nV = 20, nE = 100, horizon = 10)
      val t = tel(es)
      t.decompose(3)
      t.vertices.foreach(v => assert(t.degreeOf(v) >= 3))
    }
  }

  test("copy is deep: mutating the copy leaves the original intact") {
    val t = tel(TestGraphs.example)
    val c = t.copy()
    c.tcd(2, 3, 4)
    assert(t.numAliveEdges == 7)
    assert(t.tti.contains(Interval(1, 5)))
    assert(c.edges.forall(e => e.t >= 3 && e.t <= 4))
  }

  test("copyRange extracts a window without mutating the master") {
    for (seed <- 1 to 5) {
      val es = TestGraphs.random(seed * 271, nV = 15, nE = 80, horizon = 20)
      val master = tel(es)
      val win = master.copyRange(5, 15)
      assert(master.numAliveEdges == es.size)
      val expected = es.filter(e => e.t >= 5 && e.t <= 15)
      assert(win.edges.sortBy(e => (e.t, e.u, e.v)) == expected.sortBy(e => (e.t, e.u, e.v)))
    }
  }

  test("copyRange of an empty window yields an empty TEL") {
    val master = tel(TestGraphs.example)
    assert(master.copyRange(50, 60).isEmpty)
  }

  test("copy preserves edges, degrees and strengths") {
    val es = TestGraphs.random(99, nV = 12, nE = 50, horizon = 8)
    val t = tel(es)
    t.truncate(2, 7)
    val c = t.copy()
    assert(c.edges.sortBy(e => (e.t, e.u, e.v)) == t.edges.sortBy(e => (e.t, e.u, e.v)))
    t.vertices.foreach(v => assert(c.degreeOf(v) == t.degreeOf(v)))
  }

  test("dynamic addEdge then query equals build-from-scratch (§6.1)") {
    val es = TestGraphs.random(5, nV = 15, nE = 60, horizon = 10).sortBy(_.t)
    val (first, rest) = es.splitAt(30)
    val dyn = TEL.fromEdges(first)
    rest.foreach(e => dyn.addEdge(e.u, e.v, e.t))
    val static = TEL.fromEdges(es)
    assert(dyn.edges.sortBy(e => (e.t, e.u, e.v)) == static.edges.sortBy(e => (e.t, e.u, e.v)))
    dyn.decompose(2)
    static.decompose(2)
    assert(dyn.snapshot().map(_.canonicalKey) == static.snapshot().map(_.canonicalKey))
  }

  test("dynamic append creates new time nodes at the tail") {
    val t = tel(Vector(TemporalEdge(1, 2, 3)))
    t.addEdge(2, 3, 7)
    assert(t.timestamps == Vector(3, 7))
    assert(t.tti.contains(Interval(3, 7)))
  }

  test("link strength h=2: weak pairs purged at first decompose") {
    val t = tel(TestGraphs.multiEdge, h = 2)
    t.decompose(1)
    // (1,3) has strength 1 -> purged; (1,2) and (2,3) survive.
    assert(t.strengthOf(1, 3) == 0)
    assert(t.strengthOf(1, 2) == 3)
    assert(t.strengthOf(2, 3) == 2)
    assert(t.numAliveEdges == 5)
  }

  test("link strength h=2: truncation-induced weakening cascades") {
    val t = tel(TestGraphs.multiEdge, h = 2)
    // Dropping t>=5 leaves (1,2)x3 @1,2,3 and (2,3)x1 @4: (2,3) must purge.
    t.truncate(1, 4)
    t.decompose(1)
    assert(t.strengthOf(2, 3) == 0)
    assert(t.strengthOf(1, 2) == 3)
    assert(t.numVertices == 2)
  }

  test("link strength matches reference KCore with h on random graphs") {
    for (seed <- 1 to 8; h <- 2 to 3) {
      val es = TestGraphs.random(seed * 17, nV = 10, nE = 120, horizon = 6)
      val t = tel(es, h)
      t.decompose(2)
      val exp = KCore.core(es, 2, h)
      assert(t.snapshot().map(_.canonicalKey) == exp.map(_.canonicalKey), s"seed=$seed h=$h")
    }
  }

  test("memory footprint grows with edges and is reported") {
    val small = tel(TestGraphs.random(1, 10, 50, 10))
    val large = tel(TestGraphs.random(1, 100, 5000, 100))
    assert(small.memoryFootprintBytes > 0)
    assert(large.memoryFootprintBytes > small.memoryFootprintBytes)
  }

  test("vertex ids above 31 bits are rejected") {
    intercept[IllegalArgumentException](TEL.empty().addEdge(Int.MaxValue.toLong + 1, 1, 1))
  }

  test("snapshot vertices equal edge endpoints") {
    val t = tel(TestGraphs.example)
    t.tcd(2, 1, 5)
    val s = t.snapshot().get
    assert(s.vertices == s.edges.flatMap(e => Seq(e.u, e.v)).toSet)
  }
}

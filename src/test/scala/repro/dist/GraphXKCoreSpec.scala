package repro.dist

import repro.core.{KCore, TemporalEdge, TestGraphs}
import repro.SparkSpec

/** GraphX/RDD peeling vs the local reference and the DataFrame engine. */
class GraphXKCoreSpec extends SparkSpec {

  private def check(es: Vector[TemporalEdge], k: Int, h: Int = 1): Unit = {
    val df = EdgeOps.toDF(spark, es)
    val got = GraphXKCore.coreVertices(df, k, h)
    assert(got == KCore.coreVertices(es, k, h), s"k=$k h=$h")
  }

  test("triangle core vertices") {
    check(Vector(TemporalEdge(1, 2, 1), TemporalEdge(2, 3, 2), TemporalEdge(1, 3, 3)), 2)
  }

  test("example graph at k=2 and k=3") {
    check(TestGraphs.example, 2)
    check(TestGraphs.example, 3)
  }

  test("cascading peel (chain into clique)") {
    val clique = (for { i <- 1L to 4L; j <- (i + 1) to 4L } yield TemporalEdge(i, j, 1)).toVector
    check(clique ++ Vector(TemporalEdge(4, 10, 2), TemporalEdge(10, 11, 3)), 3)
  }

  test("random graphs match local reference") {
    for (seed <- 1 to 3; k <- 2 to 3) {
      check(TestGraphs.random(seed * 233, nV = 18, nE = 90, horizon = 8), k)
    }
  }

  test("link strength h=2") {
    check(TestGraphs.multiEdge, 1, h = 2)
  }

  test("empty graph") {
    assert(GraphXKCore.coreVertices(EdgeOps.toDF(spark, Seq.empty), 2).isEmpty)
  }

  test("GraphX and DataFrame engines agree") {
    val es = TestGraphs.random(239, nV = 20, nE = 110, horizon = 10)
    val df = EdgeOps.toDF(spark, es)
    assert(GraphXKCore.coreVertices(df, 2) == DistKCore.coreVertices(df, 2))
  }
}

package repro.dist

import org.apache.spark.graphx.{Edge, Graph}
import org.apache.spark.sql.DataFrame
import org.apache.spark.storage.StorageLevel

/** GraphX/RDD variant of distributed k-core peeling: the detemporalized
  * simple graph is materialized as a `Graph` and vertices are peeled by
  * repeated `outerJoinVertices(degrees) + subgraph` rounds until the edge
  * count reaches a fixpoint. Demonstrates the paper's decomposition as RDD
  * iterative graph analytics; cross-checked against [[DistKCore]] and the
  * local reference in tests.
  *
  * Link strength `h` is honoured the same way as in [[DistKCore]]: sub-`h`
  * pairs are excluded before building the simple graph.
  */
object GraphXKCore {

  /** Vertex set of the temporal k-core of the edge DataFrame `u, v, t`. */
  def coreVertices(edges: DataFrame, k: Int, h: Int = 1, maxIterations: Int = 1000): Set[Long] = {
    val sc = edges.sparkSession.sparkContext
    val pairRows = EdgeOps.pairStrength(edges)
      .where(org.apache.spark.sql.functions.col("strength") >= h)
      .select("a", "b").collect()
    if (pairRows.isEmpty) return Set.empty
    val edgeRDD = sc.parallelize(pairRows.toIndexedSeq.map(r => Edge(r.getLong(0), r.getLong(1), ())))
    var g = Graph.fromEdges(edgeRDD, defaultValue = 0,
      edgeStorageLevel = StorageLevel.MEMORY_ONLY,
      vertexStorageLevel = StorageLevel.MEMORY_ONLY).cache()
    var nEdges = g.numEdges
    var it = 0
    var done = nEdges == 0
    while (!done && it < maxIterations) {
      val withDeg = g.outerJoinVertices(g.degrees)((_, _, d) => d.getOrElse(0))
      val g2 = withDeg.subgraph(vpred = (_, d) => d >= k).cache()
      val n2 = g2.numEdges
      if (n2 == nEdges) done = true
      g = g2
      nEdges = n2
      if (nEdges == 0) done = true
      it += 1
    }
    require(done, s"GraphX peeling did not converge within $maxIterations iterations")
    if (nEdges == 0) Set.empty
    else g.edges.flatMap(e => Iterator(e.srcId, e.dstId)).distinct().collect().toSet
  }
}

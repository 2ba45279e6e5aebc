package repro.dist

import org.apache.spark.sql.DataFrame
import repro.core.TEL

/** Builds the in-memory Temporal Edge List from an edge DataFrame: the
  * dataflow layer sorts the edges by timestamp (a Catalyst global sort) and
  * the TEL is constructed by the same iterative appends the paper describes
  * for static construction (§5.1) — which is also exactly the dynamic-graph
  * maintenance path (§6.1), so "load from a DataFrame" and "stream arriving
  * edges" are the same code.
  */
object TELBuilder {

  def fromDataFrame(edges: DataFrame, h: Int = 1): TEL = {
    val tel = TEL.empty(h)
    edges.select("u", "v", "t").orderBy("t").toLocalIterator().forEachRemaining { r =>
      tel.addEdge(r.getLong(0), r.getLong(1), r.getInt(2))
    }
    tel
  }
}

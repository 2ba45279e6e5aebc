package repro.baseline

import repro.core._
import scala.collection.mutable

/** The paper's baseline: incremental PHC-Query (Algorithm 1, §2.3.2).
  *
  * For every anchored integer start time `ts ∈ [Ts, Te]` it sweeps `te`
  * upward, incrementally growing the vertex set `V` (popping vertices from a
  * core-time min-heap H_v) and the edge set `E` (popping edges from a
  * timestamp min-heap H_e, pushing back edges whose endpoints are not both
  * in `V` yet — the "transfer between H_e and E" that dominates the
  * baseline's cost in the paper's analysis).
  *
  * Distinctness is checked by TTI (Property 2); tests additionally verify
  * canonical-edge-list equality against OTCD and the brute-force oracle.
  */
object IPHCQuery {

  def run(
      edges: IndexedSeq[TemporalEdge],
      index: PHCIndex,
      k: Int,
      window: Interval): TCQResult = {
    require(index.k == k && index.window == window, "index does not match query")
    val Ts = window.ts
    val Te = window.te
    // Edges in [Ts, Te], indexed, for heap entries (id in low 32 bits).
    val winEdges: Array[TemporalEdge] =
      edges.filter(e => e.t >= Ts && e.t <= Te && e.u != e.v).toArray

    val seen = mutable.HashSet.empty[Interval]
    val collected = mutable.LinkedHashMap.empty[Interval, CoreResult]
    var induced = 0L
    var duplicates = 0L

    var ts = Ts
    while (ts <= Te) {
      val coreTimes = index.coreTimes(ts)
      if (coreTimes.nonEmpty) {
        // H_v: vertices ordered by core time (line 3).
        val hv = new LongMinHeap(coreTimes.size + 1)
        coreTimes.foreach { case (v, ct) => hv.push((ct.toLong << 32) | v) }
        // H_e: edges with timestamps in [ts, Te] ordered by timestamp (line 4).
        val he = new LongMinHeap(winEdges.length + 1)
        var i = 0
        while (i < winEdges.length) {
          if (winEdges(i).t >= ts) he.push((winEdges(i).t.toLong << 32) | i.toLong)
          i += 1
        }
        val vSet = mutable.LongMap.empty[Boolean]
        val eList = mutable.ArrayBuffer.empty[Int] // edge ids in E
        var minT = Int.MaxValue
        var maxT = Int.MinValue
        val pushBack = mutable.ArrayBuffer.empty[Long]
        var te = ts
        while (te <= Te) {
          // line 6: pop vertices whose core time is within te
          while (hv.nonEmpty && (hv.peek >>> 32).toInt <= te) {
            val v = hv.pop() & 0xFFFFFFFFL
            vSet(v) = true
          }
          // lines 7-8: pop edges with timestamp within te; keep those whose
          // endpoints are both in V, push the rest back
          pushBack.clear()
          while (he.nonEmpty && (he.peek >>> 32).toInt <= te) {
            val key = he.pop()
            val e = winEdges((key & 0xFFFFFFFFL).toInt)
            if (vSet.getOrElse(e.u, false) && vSet.getOrElse(e.v, false)) {
              eList += (key & 0xFFFFFFFFL).toInt
              if (e.t < minT) minT = e.t
              if (e.t > maxT) maxT = e.t
            } else pushBack += key
          }
          pushBack.foreach(he.push)
          // line 9: collect if non-empty and distinct
          if (eList.nonEmpty) {
            induced += 1
            val tti = Interval(minT, maxT)
            if (!seen.add(tti)) duplicates += 1
            else {
              val es = eList.iterator.map(winEdges(_)).toVector
              collected(tti) = CoreResult(tti, vSet.keysIterator.toSet, es)
            }
          }
          te += 1
        }
      }
      ts += 1
    }
    TCQResult(
      collected.values.toVector,
      RunStats(inducedCores = induced, duplicateCores = duplicates,
        totalCells = window.length.toLong * (window.length + 1) / 2))
  }
}

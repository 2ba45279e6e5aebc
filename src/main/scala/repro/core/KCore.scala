package repro.core

import scala.collection.mutable

/** Textbook k-core routines on simple (detemporalized) graphs.
  *
  * This is the reference substrate: the PHC-Index builder peels with it, and
  * the naïve TCQ oracle and all correctness tests compare the optimized
  * TEL-based algorithms against it. Degrees count *distinct neighbours*
  * (the paper's definition for temporal k-cores), with an optional link
  * strength threshold `h`: a neighbour only exists if connected by at least
  * `h` parallel edges (§6.2).
  */
object KCore {

  /** Builds `vertex -> (neighbour -> parallel-edge count)` adjacency. */
  def adjacency(edges: Iterable[TemporalEdge]): mutable.LongMap[mutable.LongMap[Int]] = {
    val adj = mutable.LongMap.empty[mutable.LongMap[Int]]
    def bump(a: Long, b: Long): Unit = {
      val m = adj.getOrElseUpdate(a, mutable.LongMap.empty[Int])
      m.update(b, m.getOrElse(b, 0) + 1)
    }
    edges.foreach { e =>
      if (e.u != e.v) { bump(e.u, e.v); bump(e.v, e.u) } // self-loops never add degree
    }
    adj
  }

  /** Vertex set of the k-core of the simple graph underlying `edges`,
    * honouring link strength `h` (pairs with fewer than `h` parallel edges
    * are dropped before peeling, matching the modified TCD of §6.2).
    */
  def coreVertices(edges: Iterable[TemporalEdge], k: Int, h: Int = 1): Set[Long] = {
    val adj = adjacency(edges)
    // Degree = number of neighbours with multiplicity >= h.
    val deg = mutable.LongMap.empty[Int]
    adj.foreach { case (v, nbrs) => deg(v) = nbrs.count(_._2 >= h) }
    val queue = mutable.Queue.empty[Long]
    val dead = mutable.LongMap.empty[Boolean]
    deg.foreach { case (v, d) => if (d < k) { queue.enqueue(v); dead(v) = true } }
    while (queue.nonEmpty) {
      val v = queue.dequeue()
      adj(v).foreach { case (w, mult) =>
        if (!dead.getOrElse(w, false) && mult >= h) {
          val d = deg(w) - 1
          deg(w) = d
          if (d < k) { queue.enqueue(w); dead(w) = true }
        }
      }
    }
    deg.iterator.collect { case (v, _) if !dead.getOrElse(v, false) => v }.toSet
  }

  /** The temporal k-core of `edges` as a [[CoreResult]], or None if empty.
    *
    * The core is the subgraph induced on [[coreVertices]]: all temporal edges
    * whose endpoints both survive peeling and whose pair strength is >= h.
    */
  def core(edges: Iterable[TemporalEdge], k: Int, h: Int = 1): Option[CoreResult] = {
    val verts = coreVertices(edges, k, h)
    if (verts.isEmpty) None
    else {
      val strength = mutable.LongMap.empty[Int]
      edges.foreach { e =>
        if (e.u != e.v && verts(e.u) && verts(e.v)) {
          val key = TemporalEdge.pairKey(e.u, e.v)
          strength(key) = strength.getOrElse(key, 0) + 1
        }
      }
      val kept = edges.iterator.filter { e =>
        e.u != e.v && verts(e.u) && verts(e.v) &&
          strength(TemporalEdge.pairKey(e.u, e.v)) >= h
      }.toVector
      if (kept.isEmpty) None
      else {
        val tmin = kept.iterator.map(_.t).min
        val tmax = kept.iterator.map(_.t).max
        Some(CoreResult(Interval(tmin, tmax), verts, kept))
      }
    }
  }

  /** Coreness of every vertex (Batagelj–Zaversnik by repeated peeling).
    *
    * Used by the PHC-Index builder and in tests; `h` is fixed at 1 because
    * PHC semantics (the paper's baseline) have no strength constraint.
    */
  def coreness(edges: Iterable[TemporalEdge]): Map[Long, Int] = {
    val adj = adjacency(edges)
    if (adj.isEmpty) return Map.empty
    val deg = mutable.LongMap.empty[Int]
    adj.foreach { case (v, nbrs) => deg(v) = nbrs.size }
    val result = mutable.LongMap.empty[Int]
    // Bucket peeling over degrees.
    val maxDeg = deg.values.max
    val buckets = Array.fill(maxDeg + 1)(mutable.LongMap.empty[Boolean])
    deg.foreach { case (v, d) => buckets(d)(v) = true }
    val removed = mutable.LongMap.empty[Boolean]
    var k = 0
    var processed = 0
    val n = deg.size
    while (processed < n) {
      var d = 0
      while (d <= maxDeg && buckets(d).isEmpty) d += 1
      if (d > k) k = d
      // There is always a non-empty bucket while processed < n.
      val v = buckets(d).head._1
      buckets(d).remove(v)
      removed(v) = true
      result(v) = k
      processed += 1
      adj(v).foreach { case (w, _) =>
        if (!removed.getOrElse(w, false)) {
          val dw = deg(w)
          if (dw > d) {
            buckets(dw).remove(w)
            deg(w) = dw - 1
            buckets(dw - 1)(w) = true
          }
        }
      }
    }
    result.toMap
  }
}

package repro.graphgen

import repro.core.{Interval, TemporalEdge}
import scala.collection.mutable
import scala.util.Random

/** Specification of a synthetic temporal graph.
  *
  * The model is ''planted community bursts over background noise'': each of
  * `communities` vertex groups of size `communitySize` becomes active in
  * `burstsPerCommunity` short windows (span drawn uniformly from
  * `[0, maxBurstSpan]`), during which `edgesPerBurst` parallel-edge
  * interactions are sampled among its members; `noiseEdges` additional
  * interactions are sampled uniformly over all vertices and the whole
  * horizon. This is the structure TCQ is designed to surface — dense
  * subintervals inducing distinct temporal k-cores inside a larger query
  * window — so the pruning behaviour and algorithm ordering of the paper's
  * evaluation are exercised by construction (see DESIGN.md substitutions).
  *
  * Deterministic in `seed`.
  */
final case class GraphSpec(
    name: String,
    nVertices: Int,
    horizon: Int,
    communities: Int,
    communitySize: Int,
    burstsPerCommunity: Int,
    maxBurstSpan: Int,
    edgesPerBurst: Int,
    noiseEdges: Int,
    seed: Long) {
  def targetEdges: Int = communities * burstsPerCommunity * edgesPerBurst + noiseEdges
}

object TemporalGraphGen {

  /** A planted activity burst: `members` interacted densely during `window`. */
  final case class Burst(community: Int, members: Vector[Long], window: Interval)

  final case class Generated(spec: GraphSpec, edges: Vector[TemporalEdge], bursts: Vector[Burst]) {
    def numVertices: Int = spec.nVertices
    def numEdges: Int = edges.size
    /** Span in time units between first and last interaction. */
    def span: Int = if (edges.isEmpty) 0 else edges.iterator.map(_.t).max - edges.iterator.map(_.t).min
  }

  def generate(spec: GraphSpec): Generated = {
    require(spec.communitySize >= 2 && spec.communitySize <= spec.nVertices)
    val rnd = new Random(spec.seed)
    val edges = Vector.newBuilder[TemporalEdge]
    edges.sizeHint(spec.targetEdges)
    val bursts = Vector.newBuilder[Burst]

    var c = 0
    while (c < spec.communities) {
      // Community members: a random, duplicate-free draw of vertex ids.
      val members = {
        val s = mutable.LinkedHashSet.empty[Long]
        while (s.size < spec.communitySize) s += rnd.nextInt(spec.nVertices).toLong
        s.toVector
      }
      var b = 0
      while (b < spec.burstsPerCommunity) {
        val bSpan = if (spec.maxBurstSpan == 0) 0 else rnd.nextInt(spec.maxBurstSpan + 1)
        val start = 1 + rnd.nextInt(math.max(1, spec.horizon - bSpan))
        val window = Interval(start, start + bSpan)
        bursts += Burst(c, members, window)
        var e = 0
        while (e < spec.edgesPerBurst) {
          val i = rnd.nextInt(members.size)
          var j = rnd.nextInt(members.size)
          while (j == i) j = rnd.nextInt(members.size)
          val t = window.ts + (if (bSpan == 0) 0 else rnd.nextInt(bSpan + 1))
          edges += TemporalEdge(members(i), members(j), t)
          e += 1
        }
        b += 1
      }
      c += 1
    }
    // Background noise: uniform pairs over the whole horizon.
    var n = 0
    while (n < spec.noiseEdges) {
      val u = rnd.nextInt(spec.nVertices).toLong
      var v = rnd.nextInt(spec.nVertices).toLong
      while (v == u) v = rnd.nextInt(spec.nVertices).toLong
      edges += TemporalEdge(u, v, 1 + rnd.nextInt(spec.horizon))
      n += 1
    }
    Generated(spec, edges.result(), bursts.result())
  }
}

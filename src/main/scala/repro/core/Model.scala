package repro.core

/** An undirected temporal edge: interaction between `u` and `v` at time `t`.
  *
  * Orientation (`u` as source, `v` as destination) is preserved because the
  * paper's TEL keeps separate Source Lists and Destination Lists, but all
  * degree semantics are undirected. Vertex ids must fit in 31 bits so that a
  * vertex pair packs into one `Long` (guaranteed by the generators).
  */
final case class TemporalEdge(u: Long, v: Long, t: Int) {
  /** Canonical undirected endpoint pair (smaller id first). */
  def pair: (Long, Long) = if (u <= v) (u, v) else (v, u)
}

object TemporalEdge {
  /** Packs the canonical pair of `(u, v)` into a single Long key. */
  def pairKey(u: Long, v: Long): Long = {
    val lo = math.min(u, v)
    val hi = math.max(u, v)
    (lo << 32) | hi
  }
}

/** A closed integer time interval `[ts, te]`. */
final case class Interval(ts: Int, te: Int) {
  require(ts <= te, s"empty interval [$ts, $te]")
  def contains(other: Interval): Boolean = ts <= other.ts && other.te <= te
  def span: Int = te - ts
  def length: Int = te - ts + 1
  override def toString: String = s"[$ts,$te]"
}

/** Constraints from the paper's query-model extensions (§6.2).
  *
  * @param minStrength lower bound `h` on the number of parallel edges between
  *                    every linked vertex pair in a result core (h=1 is the
  *                    plain TCQ semantics)
  * @param maxSpan     optional upper bound on the result core's TTI span
  *                    (`te' - ts'`), e.g. 0 keeps only single-timestamp cores
  */
final case class Constraints(minStrength: Int = 1, maxSpan: Option[Int] = None) {
  require(minStrength >= 1, "minStrength must be >= 1")
  def admitsSpan(tti: Interval): Boolean = maxSpan.forall(tti.span <= _)
}

object Constraints {
  val none: Constraints = Constraints()
}

/** An induced temporal k-core, snapshotted out of a TEL (or any engine).
  *
  * Identity of a core is its edge multiset; `canonicalKey` sorts the edges so
  * equal cores compare equal regardless of induction order. Per Property 2 of
  * the paper the TTI alone is already a unique key among the cores of one TCQ
  * instance — tests validate that empirically against `canonicalKey`.
  */
final case class CoreResult(tti: Interval, vertices: Set[Long], edges: Vector[TemporalEdge]) {
  def numVertices: Int = vertices.size
  def numEdges: Int = edges.size
  def canonicalKey: Vector[(Long, Long, Int)] =
    edges.map(e => { val (a, b) = e.pair; (a, b, e.t) }).sorted
}

/** The answer to one TCQ instance: all distinct cores, plus run statistics. */
final case class TCQResult(cores: Vector[CoreResult], stats: RunStats) {
  def count: Int = cores.size
  def byTTI: Map[Interval, CoreResult] = cores.map(c => c.tti -> c).toMap
}

/** Counters reported by the enumeration algorithms.
  *
  * @param inducedCores    number of TCD operations that produced a non-empty core
  * @param duplicateCores  induced cores that duplicated an earlier one (0 for OTCD)
  * @param cellsVisited    schedule cells actually processed
  * @param totalCells      `span * (span+1) / 2` cells in the schedule
  * @param prunedPoR/PoU/PoL cells pruned per rule, first-pruner attribution
  * @param triggersPoR/PoU/PoL number of cells whose TTI triggered each rule
  */
final case class RunStats(
    inducedCores: Long = 0,
    duplicateCores: Long = 0,
    cellsVisited: Long = 0,
    totalCells: Long = 0,
    prunedPoR: Long = 0,
    prunedPoU: Long = 0,
    prunedPoL: Long = 0,
    triggersPoR: Long = 0,
    triggersPoU: Long = 0,
    triggersPoL: Long = 0) {
  def prunedTotal: Long = prunedPoR + prunedPoU + prunedPoL
  def prunedPct(rule: Long): Double =
    if (totalCells == 0) 0.0 else 100.0 * rule / totalCells
}

package repro.core

/** A mutable temporal-graph state that supports the TCD operation.
  *
  * The enumeration driver ([[TCQ]]) is engine-agnostic: the paper's TEL is
  * the production engine ([[TELState]]), and `repro.dist.DistTCQ` plugs a
  * Spark DataFrame state into the same driver, so the pruning logic is
  * shared and cross-checked between the two.
  */
trait CoreState {
  /** Truncation: drop edges with timestamps outside `[ts, te]`. */
  def truncate(ts: Int, te: Int): Unit

  /** Decomposition: peel vertices with fewer than `k` qualified neighbours. */
  def decompose(k: Int): Unit

  /** Current graph as a core result; None when empty. */
  def snapshot(): Option[CoreResult]

  /** Independent deep copy of the current state. */
  def copyState(): CoreState
}

/** Factory for the initial state `G[Ts,Te]` of a TCQ run. */
trait CoreEngine {
  /** Projected (truncated, not decomposed) graph over `[ts, te]`. */
  def initial(ts: Int, te: Int): CoreState
}

/** [[CoreState]] over the paper's TEL. */
final class TELState(val tel: TEL) extends CoreState {
  override def truncate(ts: Int, te: Int): Unit = tel.truncate(ts, te)
  override def decompose(k: Int): Unit = tel.decompose(k)
  override def snapshot(): Option[CoreResult] = tel.snapshot()
  override def copyState(): CoreState = new TELState(tel.copy())
}

/** [[CoreEngine]] over an in-memory edge collection, building one master TEL
  * and truncating copies of it per query window (§5.2: the algorithm "starts
  * to work on a copy of TEL(G[Ts,Te])").
  *
  * @param h link-strength bound for the §6.2 extension
  */
final class TELEngine(allEdges: IndexedSeq[TemporalEdge], h: Int = 1) extends CoreEngine {
  /** The master TEL of the full graph; never mutated by queries. */
  val master: TEL = TEL.fromEdges(allEdges, h)

  override def initial(ts: Int, te: Int): CoreState =
    new TELState(master.copyRange(ts, te))
}

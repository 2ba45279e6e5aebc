package repro.core

/** The subinterval enumeration schedule of Figure 4: a triangular matrix of
  * cells `(r, c) = [ts, te]` with `Ts <= r <= c <= Te`, traversed row by row
  * and right to left. Implements the three pruning rules of §4.2
  * (Algorithm 3) with per-rule statistics for Table 4.
  *
  * Attribution is first-pruner: a cell already pruned by an earlier trigger
  * is never re-counted (the paper's per-rule percentages in Table 4 sum to
  * the total, implying the same accounting).
  */
final class Schedule(val Ts: Int, val Te: Int) {
  require(Te >= Ts, s"bad window [$Ts,$Te]")
  val span: Int = Te - Ts + 1
  require(span.toLong * span <= (1L << 31) - 8, s"schedule span $span too large")

  private val NotPruned: Byte = 0
  private val cells = new Array[Byte](span * span)

  private var _prunedPoR = 0L
  private var _prunedPoU = 0L
  private var _prunedPoL = 0L
  private var _triggersPoR = 0L
  private var _triggersPoU = 0L
  private var _triggersPoL = 0L
  private var _visited = 0L

  @inline private def idx(r: Int, c: Int): Int = (r - Ts) * span + (c - Ts)

  def isPruned(r: Int, c: Int): Boolean = cells(idx(r, c)) != NotPruned

  private def mark(r: Int, c: Int, rule: Byte): Unit = {
    val i = idx(r, c)
    if (cells(i) == NotPruned) {
      cells(i) = rule
      rule match {
        case 1 => _prunedPoR += 1
        case 2 => _prunedPoU += 1
        case _ => _prunedPoL += 1
      }
    }
  }

  def recordVisit(): Unit = _visited += 1

  /** Algorithm 3: given the TTI `[ts', te']` of the core just induced at
    * cell `[ts, te]`, prune the cells each rule predicts to be duplicates.
    */
  def applyRules(ts: Int, te: Int, tti: Interval): Unit = {
    val ts1 = tti.ts
    val te1 = tti.te
    if (te1 < te) { // Rule 1: Pruning-on-the-Right (Lemma 2)
      _triggersPoR += 1
      var c = te - 1
      while (c >= te1) { mark(ts, c, 1); c -= 1 }
    }
    if (ts1 > ts) { // Rule 2: Pruning-on-the-Underside (Lemmas 3–4)
      _triggersPoU += 1
      var r = ts + 1
      while (r <= ts1) {
        var c = te
        while (c >= r) { mark(r, c, 2); c -= 1 }
        r += 1
      }
    }
    if (ts1 > ts && te1 < te) { // Rule 3: Pruning-on-the-Left (Lemma 5)
      _triggersPoL += 1
      var r = ts1 + 1
      while (r <= te1) {
        var c = te
        while (c >= te1 + 1) { mark(r, c, 3); c -= 1 }
        r += 1
      }
    }
  }

  /** True when every cell of row `r` is pruned (the row can be skipped
    * without copying the row-source graph).
    */
  def rowFullyPruned(r: Int): Boolean = {
    var c = r
    while (c <= Te) {
      if (!isPruned(r, c)) return false
      c += 1
    }
    true
  }

  def totalCells: Long = span.toLong * (span + 1) / 2

  def stats(induced: Long, duplicates: Long): RunStats = RunStats(
    inducedCores = induced,
    duplicateCores = duplicates,
    cellsVisited = _visited,
    totalCells = totalCells,
    prunedPoR = _prunedPoR,
    prunedPoU = _prunedPoU,
    prunedPoL = _prunedPoL,
    triggersPoR = _triggersPoR,
    triggersPoU = _triggersPoU,
    triggersPoL = _triggersPoL,
  )
}

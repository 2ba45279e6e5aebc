package repro.core

import scala.collection.mutable

/** The subinterval-enumeration driver shared by TCD (Algorithm 2) and OTCD
  * (Algorithm 2 + Algorithm 3 pruning).
  *
  * For each anchored start time `ts` (a schedule row) the driver maintains a
  * ''row source'' `G[ts, Te]` by incremental head-truncation of the initial
  * `G[Ts, Te]`, and induces the row's cores decrementally: the first core of
  * the row by a TCD operation on a copy of the row source, every subsequent
  * core by a TCD operation on the previously induced core (Theorem 1).
  *
  * With `pruning = true` the TTI of every induced core feeds Algorithm 3,
  * skipping cells predicted to induce duplicates; the driver then visits
  * only the cells needed to emit each distinct core (§4.3).
  *
  * Early termination: if the core of `[ts, Te]` is empty then every
  * remaining subinterval's core is empty too (Lemma 1) and the whole run
  * stops; if a smaller cell's core is empty only the row ends.
  */
object TCQ {

  def run(
      engine: CoreEngine,
      k: Int,
      window: Interval,
      constraints: Constraints = Constraints.none,
      pruning: Boolean = true): TCQResult = {
    val Ts = window.ts
    val Te = window.te
    val sched = new Schedule(Ts, Te)
    val collected = mutable.LinkedHashMap.empty[Interval, CoreResult]
    val seen = mutable.HashSet.empty[Interval]
    var induced = 0L
    var duplicates = 0L

    val rowSource = engine.initial(Ts, Te)
    var stop = false
    var r = Ts
    while (r <= Te && !stop) {
      rowSource.truncate(r, Te)
      if (!(pruning && sched.rowFullyPruned(r))) {
        var working: CoreState = null
        var rowDead = false
        var c = Te
        while (c >= r && !rowDead) {
          if (!(pruning && sched.isPruned(r, c))) {
            sched.recordVisit()
            if (working == null) working = rowSource.copyState()
            working.truncate(r, c)
            working.decompose(k)
            working.snapshot() match {
              case None =>
                // Smaller intervals induce subgraphs (Lemma 1): the row is
                // done; if even [r, Te] is empty the whole schedule is.
                if (c == Te) stop = true
                rowDead = true
              case Some(core) =>
                induced += 1
                if (!seen.add(core.tti)) duplicates += 1
                else if (constraints.admitsSpan(core.tti)) collected(core.tti) = core
                if (pruning) sched.applyRules(r, c, core.tti)
            }
          }
          c -= 1
        }
      }
      r += 1
    }
    TCQResult(collected.values.toVector, sched.stats(induced, duplicates))
  }
}

/** TCD algorithm (Algorithm 2): full enumeration, no inter-core pruning. */
object TCD {
  def run(
      engine: CoreEngine,
      k: Int,
      window: Interval,
      constraints: Constraints = Constraints.none): TCQResult =
    TCQ.run(engine, k, window, constraints, pruning = false)

  /** Convenience on raw edges via a TEL engine. */
  def run(edges: IndexedSeq[TemporalEdge], k: Int, window: Interval): TCQResult =
    run(new TELEngine(edges), k, window)
}

/** OTCD algorithm (§4.3): TCD + TTI-based pruning rules. */
object OTCD {
  def run(
      engine: CoreEngine,
      k: Int,
      window: Interval,
      constraints: Constraints = Constraints.none): TCQResult =
    TCQ.run(engine, k, window, constraints, pruning = true)

  /** Convenience on raw edges via a TEL engine. */
  def run(edges: IndexedSeq[TemporalEdge], k: Int, window: Interval): TCQResult =
    run(edges, k, window, Constraints.none)

  /** Convenience on raw edges with constraints (link strength builds the
    * TEL with the matching purge bound).
    */
  def run(
      edges: IndexedSeq[TemporalEdge],
      k: Int,
      window: Interval,
      constraints: Constraints): TCQResult =
    run(new TELEngine(edges, constraints.minStrength), k, window, constraints)
}

/** Brute-force reference: peel every subinterval from scratch with the
  * textbook algorithm ([[KCore]]), dedupe by canonical edge list. This is
  * the correctness oracle for TCD, OTCD, iPHC-Query and the distributed
  * engines — `O(span² |E|)`, test-scale only.
  */
object NaiveTCQ {
  def run(
      edges: IndexedSeq[TemporalEdge],
      k: Int,
      window: Interval,
      constraints: Constraints = Constraints.none): Vector[CoreResult] = {
    val seen = mutable.HashSet.empty[Vector[(Long, Long, Int)]]
    val out = Vector.newBuilder[CoreResult]
    var ts = window.ts
    while (ts <= window.te) {
      var te = window.te
      while (te >= ts) {
        val sub = edges.filter(e => e.t >= ts && e.t <= te)
        KCore.core(sub, k, constraints.minStrength).foreach { core =>
          if (seen.add(core.canonicalKey) && constraints.admitsSpan(core.tti)) out += core
        }
        te -= 1
      }
      ts += 1
    }
    out.result()
  }
}

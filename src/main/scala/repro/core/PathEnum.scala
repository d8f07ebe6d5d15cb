package repro.core

import scala.collection.mutable

/** Outcome of an enumeration run.
  *
  * @param subgraph  union of vertices/edges over the temporal simple paths found so far
  * @param pathCount number of temporal simple paths found (complete iff `complete`)
  * @param complete  false when a cap fired — the analogue of the paper's 12h INF cutoff
  */
final case class EnumResult(subgraph: Subgraph, pathCount: Long, complete: Boolean)

/** Exhaustive temporal simple path enumeration (the naive method of §III-A and the
  * enumeration stage of the EP baselines): DFS from `s` with strictly ascending edge
  * timestamps inside `[τb, τe]` and an on-path vertex set; every path reaching `t` adds
  * its vertices/edges to the result. Worst case `O(d^θ · θ · m)`.
  */
object PathEnum {

  /** Enumerate in `g` (typically an upper-bound graph; pass the original graph for the
    * naive method — out-of-window edges are skipped during the DFS).
    *
    * @param maxPaths      stop after this many complete paths
    * @param timeBudgetNs  stop after this much wall-clock time (≤ 0: unlimited)
    */
  def run(g: TemporalGraph, q: TspgQuery,
          maxPaths: Long = Long.MaxValue, timeBudgetNs: Long = 0L): EnumResult = {
    val deadline = if (timeBudgetNs > 0) System.nanoTime() + timeBudgetNs else Long.MaxValue
    val onPath   = mutable.BitSet(q.s)
    val stack    = mutable.ArrayBuffer.empty[TEdge]
    val vOut     = mutable.Set.empty[Int]
    val eOut     = mutable.Set.empty[TEdge]
    var paths    = 0L
    var calls    = 0L
    var capped   = false

    def record(): Unit = {
      paths += 1
      // Inserting per edge of each discovered path — the redundancy VUG avoids (§I
      // drawback ii); sets make it idempotent, matching the baselines' description.
      vOut += q.s
      stack.foreach { e => vOut += e.dst; eOut += e }
      if (paths >= maxPaths) capped = true
    }

    def dfs(cur: Int, lastTs: Int): Unit = {
      if (capped) return
      calls += 1
      // Check the clock on a call counter, not the path counter: a branch that stops
      // yielding complete paths must still notice the deadline.
      if ((calls & 0xfff) == 0 && System.nanoTime() > deadline) { capped = true; return }
      val out = g.outEdges(cur) // ascending ts
      var i   = 0
      while (i < out.length && !capped) {
        val e = out(i)
        if (e.ts > q.tauE) i = out.length // ascending: rest out of window
        else {
          if (e.ts > lastTs && e.ts >= q.tauB && !onPath.contains(e.dst)) {
            stack += e
            if (e.dst == q.t) record() // simple paths end at t; never extend past it
            else {
              onPath += e.dst
              dfs(e.dst, e.ts)
              onPath -= e.dst
            }
            stack.remove(stack.length - 1)
          }
          i += 1
        }
      }
    }

    dfs(q.s, q.tauB - 1)
    EnumResult(Subgraph(vOut.toSet, eOut.toSet), paths, complete = !capped)
  }

  /** Count temporal simple paths without materializing the subgraph (Exp-7). */
  def countPaths(g: TemporalGraph, q: TspgQuery,
                 maxPaths: Long = Long.MaxValue, timeBudgetNs: Long = 0L): (Long, Boolean) = {
    val r = run(g, q, maxPaths, timeBudgetNs)
    (r.pathCount, r.complete)
  }
}

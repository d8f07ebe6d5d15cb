package repro.core

import java.util.PriorityQueue

/** The three baseline upper-bound graph reductions of §III-A and the corresponding
  * enumerate-on-upper-bound-graph algorithms EPdtTSG / EPesTSG / EPtgTSG.
  */
object Baselines {

  // ---------------------------------------------------------------------------------
  // dtTSG — projected graph: prune edges with τ ∉ [τb, τe]. O(m).
  // ---------------------------------------------------------------------------------
  def dtTsg(g: TemporalGraph, q: TspgQuery): TemporalGraph =
    g.filterEdges(e => e.ts >= q.tauB && e.ts <= q.tauE)

  // ---------------------------------------------------------------------------------
  // esTSG (Jin et al.) — keep edges lying on some s→t walk with NON-DECREASING
  // timestamps: bidirectional temporal traversal (forward non-decreasing earliest
  // arrival, backward non-ascending latest departure), keep bidirectionally marked
  // edges. O(m) amortized.
  // ---------------------------------------------------------------------------------
  def esTsg(g: TemporalGraph, q: TspgQuery): TemporalGraph = {
    val arr = nonDecreasingArrivals(g, q)
    val dep = nonAscendingDepartures(g, q)
    g.filterEdges { e =>
      e.ts >= q.tauB && e.ts <= q.tauE && arr(e.src) <= e.ts && e.ts <= dep(e.dst)
    }
  }

  /** Earliest non-decreasing arrival from `s` (`arr(s) = τb` so any in-window first
    * edge qualifies); label-correcting FIFO relaxation.
    */
  private def nonDecreasingArrivals(g: TemporalGraph, q: TspgQuery): Array[Int] = {
    val a = Array.fill(g.n)(Int.MaxValue)
    a(q.s) = q.tauB
    val inQ   = new Array[Boolean](g.n)
    val queue = scala.collection.mutable.ArrayDeque[Int](q.s)
    inQ(q.s) = true
    while (queue.nonEmpty) {
      val u = queue.removeHead(); inQ(u) = false
      val au = a(u)
      g.outEdges(u).foreach { e =>
        if (e.ts <= q.tauE && e.ts >= au && e.ts < a(e.dst)) {
          a(e.dst) = e.ts
          if (!inQ(e.dst)) { queue.append(e.dst); inQ(e.dst) = true }
        }
      }
    }
    a
  }

  private def nonAscendingDepartures(g: TemporalGraph, q: TspgQuery): Array[Int] = {
    val d = Array.fill(g.n)(Int.MinValue)
    d(q.t) = q.tauE
    val inQ   = new Array[Boolean](g.n)
    val queue = scala.collection.mutable.ArrayDeque[Int](q.t)
    inQ(q.t) = true
    while (queue.nonEmpty) {
      val u = queue.removeHead(); inQ(u) = false
      val du = d(u)
      g.inEdges(u).foreach { e =>
        if (e.ts >= q.tauB && e.ts <= du && e.ts > d(e.src)) {
          d(e.src) = e.ts
          if (!inQ(e.src)) { queue.append(e.src); inQ(e.src) = true }
        }
      }
    }
    d
  }

  // ---------------------------------------------------------------------------------
  // tgTSG (Jin et al.) — keep edges lying on some s→t path with strictly ASCENDING
  // timestamps, via bidirectional Dijkstra with a priority queue:
  // O((n+m)·log n + m). Produces exactly the same graph as QuickUBG (the paper's
  // §IV-A discussion; our property tests assert the equality), but pays the log-factor
  // the paper's Exp-5 measures.
  // ---------------------------------------------------------------------------------
  def tgTsg(g: TemporalGraph, q: TspgQuery): TemporalGraph = {
    val arr = dijkstraArrivals(g, q)
    val dep = dijkstraDepartures(g, q)
    g.filterEdges(e => arr(e.src) < e.ts && e.ts < dep(e.dst))
  }

  private def dijkstraArrivals(g: TemporalGraph, q: TspgQuery): Array[Int] = {
    val a = Array.fill(g.n)(PolarityTime.NoArrival)
    a(q.s) = q.tauB - 1
    val pq = new PriorityQueue[Long]() // (arrival << 32 | vertex), natural order
    pq.add(pack(a(q.s), q.s))
    val settled = new Array[Boolean](g.n)
    while (!pq.isEmpty) {
      val top = pq.poll()
      val u   = unpackVertex(top)
      if (!settled(u) && unpackKey(top) == a(u)) {
        settled(u) = true
        val au = a(u)
        g.outEdges(u).foreach { e =>
          if (e.dst != q.t && e.ts <= q.tauE && e.ts > au && e.ts < a(e.dst)) {
            a(e.dst) = e.ts
            pq.add(pack(e.ts, e.dst))
          }
        }
      }
    }
    a
  }

  private def dijkstraDepartures(g: TemporalGraph, q: TspgQuery): Array[Int] = {
    val d = Array.fill(g.n)(PolarityTime.NoDeparture)
    d(q.t) = q.tauE + 1
    val pq = new PriorityQueue[Long]()
    pq.add(pack(-d(q.t), q.t)) // negate: we want max-departure first
    val settled = new Array[Boolean](g.n)
    while (!pq.isEmpty) {
      val top = pq.poll()
      val u   = unpackVertex(top)
      if (!settled(u) && -unpackKey(top) == d(u)) {
        settled(u) = true
        val du = d(u)
        g.inEdges(u).foreach { e =>
          if (e.src != q.s && e.ts >= q.tauB && e.ts < du && e.ts > d(e.src)) {
            d(e.src) = e.ts
            pq.add(pack(-e.ts, e.src))
          }
        }
      }
    }
    d
  }

  private def pack(key: Int, v: Int): Long  = (key.toLong << 32) | (v.toLong & 0xffffffffL)
  private def unpackKey(x: Long): Int       = (x >> 32).toInt
  private def unpackVertex(x: Long): Int    = x.toInt

  // ---------------------------------------------------------------------------------
  // EP* — reduce, then enumerate temporal simple paths on the reduced graph.
  // ---------------------------------------------------------------------------------
  def epDtTsg(g: TemporalGraph, q: TspgQuery,
              maxPaths: Long = Long.MaxValue, timeBudgetNs: Long = 0L): EnumResult =
    PathEnum.run(dtTsg(g, q), q, maxPaths, timeBudgetNs)

  def epEsTsg(g: TemporalGraph, q: TspgQuery,
              maxPaths: Long = Long.MaxValue, timeBudgetNs: Long = 0L): EnumResult =
    PathEnum.run(esTsg(g, q), q, maxPaths, timeBudgetNs)

  def epTgTsg(g: TemporalGraph, q: TspgQuery,
              maxPaths: Long = Long.MaxValue, timeBudgetNs: Long = 0L): EnumResult =
    PathEnum.run(tgTsg(g, q), q, maxPaths, timeBudgetNs)
}

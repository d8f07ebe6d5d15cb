package repro.core

import scala.collection.mutable

/** Polarity time computation (paper Algorithm 3, Definitions 3–4).
  *
  * For every vertex `u`, the earliest arrival time `A(u)` of any strict-ascending
  * temporal path from `s` within `[τb, τe]` that does not pass through `t`, and the
  * latest departure time `D(u)` of any such path from `u` to `t` that does not pass
  * through `s`. Conventions follow the paper: `A(s) = τb − 1`, `D(t) = τe + 1`,
  * `A(u) = +∞` / `D(u) = −∞` when no such path exists (here `NoArrival` /
  * `NoDeparture`).
  *
  * Implementation is the paper's label-correcting BFS: earliest arrival is monotone
  * (arriving earlier never disables an out-edge), so a FIFO queue with improvement
  * checks converges to the fixpoint in `O(n + m)` amortized time without the priority
  * queue that makes `tgTSG` an `O(log n)` factor slower (§IV-A discussion).
  */
object PolarityTime {

  /** Sentinel for `A(u) = +∞` (no temporal path from `s` to `u`). */
  val NoArrival: Int = Int.MaxValue

  /** Sentinel for `D(u) = −∞` (no temporal path from `u` to `t`). */
  val NoDeparture: Int = Int.MinValue

  /** Earliest arrival times `A(·)` for a query (avoiding `t`, per Algorithm 3 line 6). */
  def arrivals(g: TemporalGraph, q: TspgQuery): Array[Int] =
    earliestArrivals(g, q.s, q.tauB, q.tauE, avoid = q.t)

  /** Latest departure times `D(·)` for a query (avoiding `s`). */
  def departures(g: TemporalGraph, q: TspgQuery): Array[Int] =
    latestDepartures(g, q.t, q.tauB, q.tauE, avoid = q.s)

  /** Earliest strict-ascending arrival from `source` within `[tauB, tauE]`.
    *
    * `avoid` (< 0 to disable) is a vertex the traversal never enters — the paper uses
    * `avoid = t` so that `A` only reflects paths not passing through the target
    * (needed for Lemma 2's simple-path argument). With `avoid < 0` this is plain
    * temporal earliest-arrival, used for workload generation.
    */
  def earliestArrivals(g: TemporalGraph, source: Int, tauB: Int, tauE: Int,
                       avoid: Int): Array[Int] =
    earliestArrivals(g, source, tauB, tauE, avoid, -1)

  /** [[earliestArrivals]] with a second avoided vertex (used by EEV's per-seed gates:
    * the prefix of a witness path through `e(u, v, τ)` can contain neither `t` nor `v`).
    */
  def earliestArrivals(g: TemporalGraph, source: Int, tauB: Int, tauE: Int,
                       avoid: Int, avoid2: Int): Array[Int] =
    earliestArrivalsWithParents(g, source, tauB, tauE, avoid, avoid2)._1

  /** [[earliestArrivals]] additionally returning the relaxation parent edge of each
    * reached vertex. Following parents from any reached `u` back to `source` yields a
    * temporal path whose arrival times strictly ascend — hence a temporal *simple*
    * path arriving at `A(u)` (used by EEV's tree-witness shortcut).
    */
  def earliestArrivalsWithParents(g: TemporalGraph, source: Int, tauB: Int, tauE: Int,
                                  avoid: Int, avoid2: Int): (Array[Int], Array[TEdge]) = {
    val a = Array.fill(g.n)(NoArrival)
    a(source) = tauB - 1
    val parent = new Array[TEdge](g.n)
    val inQ   = new Array[Boolean](g.n)
    val queue = mutable.ArrayDeque[Int](source)
    inQ(source) = true
    while (queue.nonEmpty) {
      val u = queue.removeHead()
      inQ(u) = false
      val au  = a(u)
      val out = g.outEdges(u) // ascending ts
      var i   = 0
      var continueScan = true
      while (continueScan && i < out.length) {
        val e = out(i)
        if (e.ts > tauE) continueScan = false // ascending: all later edges out of window
        else if (e.dst != avoid && e.dst != avoid2 && e.ts > au && e.ts < a(e.dst)) {
          a(e.dst) = e.ts
          parent(e.dst) = e
          // `ts == tauE` cannot be extended (next edge would need ts > tauE): skip the
          // queue, matching Algorithm 3 line 9.
          if (e.ts != tauE && !inQ(e.dst)) { queue.append(e.dst); inQ(e.dst) = true }
        }
        i += 1
      }
    }
    (a, parent)
  }

  /** Latest strict-ascending departure towards `target` within `[tauB, tauE]`
    * (mirror of [[earliestArrivals]]; Algorithm 3 line 10).
    */
  def latestDepartures(g: TemporalGraph, target: Int, tauB: Int, tauE: Int,
                       avoid: Int): Array[Int] =
    latestDepartures(g, target, tauB, tauE, avoid, -1)

  /** [[latestDepartures]] with a second avoided vertex (EEV per-seed gates: the suffix
    * of a witness path through `e(u, v, τ)` can contain neither `s` nor `u`).
    */
  def latestDepartures(g: TemporalGraph, target: Int, tauB: Int, tauE: Int,
                       avoid: Int, avoid2: Int): Array[Int] =
    latestDeparturesWithParents(g, target, tauB, tauE, avoid, avoid2)._1

  /** [[latestDepartures]] additionally returning the relaxation parent edge of each
    * reached vertex. Following parents from any reached `v` forward to `target` yields
    * a temporal simple path departing at `D(v)` (EEV's tree-witness shortcut).
    */
  def latestDeparturesWithParents(g: TemporalGraph, target: Int, tauB: Int, tauE: Int,
                                  avoid: Int, avoid2: Int): (Array[Int], Array[TEdge]) = {
    val d = Array.fill(g.n)(NoDeparture)
    d(target) = tauE + 1
    val parent = new Array[TEdge](g.n)
    val inQ   = new Array[Boolean](g.n)
    val queue = mutable.ArrayDeque[Int](target)
    inQ(target) = true
    while (queue.nonEmpty) {
      val u = queue.removeHead()
      inQ(u) = false
      val du = d(u)
      val in = g.inEdges(u) // ascending ts; scan backward for descending
      var i  = in.length - 1
      var continueScan = true
      while (continueScan && i >= 0) {
        val e = in(i)
        if (e.ts < tauB) continueScan = false
        else if (e.src != avoid && e.src != avoid2 && e.ts < du && e.ts > d(e.src)) {
          d(e.src) = e.ts
          parent(e.src) = e
          if (e.ts != tauB && !inQ(e.src)) { queue.append(e.src); inQ(e.src) = true }
        }
        i -= 1
      }
    }
    (d, parent)
  }
}

package repro.core

/** Quick upper-bound graph generation (paper Algorithm 2).
  *
  * Keeps exactly the edges `e(u, v, τ)` with `A(u) < τ < D(v)` — by Lemma 1 these are
  * precisely the edges lying on at least one strict-ascending temporal path from `s`
  * to `t` within the query interval. The sentinel values of [[PolarityTime]]
  * (`NoArrival = +∞`, `NoDeparture = −∞`) make the comparison fail naturally for
  * unreachable endpoints.
  */
object QuickUbg {

  /** `Gq` from precomputed polarity times. `O(m)` time (Theorem 1). */
  def apply(g: TemporalGraph, arrivals: Array[Int], departures: Array[Int]): TemporalGraph =
    g.filterEdges(e => arrivals(e.src) < e.ts && e.ts < departures(e.dst))

  /** `Gq` computing polarity times internally (Algorithms 3 + 2). */
  def compute(g: TemporalGraph, q: TspgQuery): TemporalGraph =
    apply(g, PolarityTime.arrivals(g, q), PolarityTime.departures(g, q))
}

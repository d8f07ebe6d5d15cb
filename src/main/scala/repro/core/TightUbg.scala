package repro.core

/** Tight upper-bound graph generation (paper Algorithm 5, Lemmas 8–9).
  *
  * An edge `e(u, v, τ)` of `Gq` survives into `Gt` iff
  *   - `u = s` or `v = t` (Lemma 2 condition ii — such edges are certainly in tspG), or
  *   - `TCV_{τl}(s, u) ∩ TCV_{τr}(v, t) = ∅`, where `τl` is the largest in-timestamp of
  *     `u` below `τ` and `τr` the smallest out-timestamp of `v` above `τ` — by Lemma 8
  *     this single intersection subsumes every `(τi, τj)` combination.
  *
  * The `TcvSide` lookups resolve `τl`/`τr` directly (`atOrBefore(u, τ−1)` /
  * `atOrAfter(v, τ+1)` — entry timestamps are exactly `T_in(u)` / `T_out(v)` up to
  * Lemma 7 pruning, which preserves lookup values). A `null` lookup means no temporal
  * path reaches `u` before `τ` (or leaves `v` after `τ`), which cannot happen on a
  * well-formed `Gq` edge (Lemma 4) but makes the method total on arbitrary inputs.
  * `O(n + θ·m)` time (Theorem 4).
  */
object TightUbg {

  def apply(gq: TemporalGraph, q: TspgQuery, fwd: TcvSide, bwd: TcvSide): TemporalGraph =
    gq.filterEdges { e =>
      if (e.src == q.s || e.dst == q.t) true
      else {
        val f = fwd.atOrBefore(e.src, e.ts - 1)
        val b = bwd.atOrAfter(e.dst, e.ts + 1)
        f != null && b != null && !SortedIntSet.intersects(f, b)
      }
    }

  /** `Gt` computing the TCV index internally (Algorithms 4 + 5). */
  def compute(gq: TemporalGraph, q: TspgQuery): TemporalGraph =
    apply(gq, q, Tcv.forward(gq, q), Tcv.backward(gq, q))
}

package repro.core

import scala.collection.mutable

/** Frozen time-stream common vertex entries for one direction (paper Def. 5).
  *
  * For the forward side, vertex `u` has one entry per distinct in-timestamp in
  * `T_in(u, Gq)` (up to Lemma 7 pruning), holding `TCV_τ(s, u)`. For the backward side,
  * entries sit at out-timestamps and hold `TCV_τ(u, t)`. Entry timestamps are stored
  * ascending; sets are sorted vertex-id arrays (size ≤ θ, so merge-style ops are cheap).
  *
  * Lemma 5 lookups: `TCV_x(s,u)` for an arbitrary `x` equals the entry at the largest
  * entry-timestamp ≤ `x` ([[atOrBefore]]); `TCV_x(u,t)` equals the entry at the smallest
  * entry-timestamp ≥ `x` ([[atOrAfter]]). Lemma 7 pruning drops entries past the point
  * where the set collapses to `{u}`; because the stored boundary entry *is* `{u}`, both
  * lookups still return the correct value for pruned timestamps.
  *
  * A `null` lookup result means no qualifying temporal path exists at all (never the
  * case for edges of `Gq`, by Lemma 4).
  */
final class TcvSide private[core] (
    entryTsArr: Array[Array[Int]],
    entrySetArr: Array[Array[Array[Int]]],
) {

  /** Entry at the largest entry-timestamp `≤ x`, or `null`. Forward-side lookup. */
  def atOrBefore(u: Int, x: Int): Array[Int] = {
    val ts = entryTsArr(u)
    var i  = ts.length - 1
    while (i >= 0 && ts(i) > x) i -= 1
    if (i < 0) null else entrySetArr(u)(i)
  }

  /** Entry at the smallest entry-timestamp `≥ x`, or `null`. Backward-side lookup. */
  def atOrAfter(u: Int, x: Int): Array[Int] = {
    val ts = entryTsArr(u)
    var i  = 0
    while (i < ts.length && ts(i) < x) i += 1
    if (i >= ts.length) null else entrySetArr(u)(i)
  }

  /** Stored entries of `u` as `(timestamp, sorted set)` pairs, ascending (for tests). */
  def entries(u: Int): IndexedSeq[(Int, Set[Int])] =
    entryTsArr(u).indices.map(i => (entryTsArr(u)(i), entrySetArr(u)(i).toSet))
}

/** Time-stream common vertices computation (paper Algorithm 4, Eqs. 3–4).
  *
  * By Lemma 6, intersecting vertex sets over temporal *walks* equals intersecting over
  * temporal simple paths, so the recursion needs no simple-path checks: scanning the
  * edges of `Gq` in non-descending timestamp order, each edge `e(v, u, τ)` folds
  * `TCV_{τ−1}(s, v) ∪ {u}` into the running intersection for `u`'s entry at `τ`
  * (symmetric backward). `O(n + θ·m)` time and space (Theorem 3).
  */
object Tcv {

  /** Forward entries `TCV_·(s, ·)` over the quick upper-bound graph. */
  def forward(gq: TemporalGraph, q: TspgQuery): TcvSide = {
    val builder = new SideBuilder(gq.n)
    val edges   = gq.edges // ascending ts
    var i = 0
    while (i < edges.length) {
      val e = edges(i)
      val u = e.dst
      val v = e.src
      // Entries are defined for u ∉ {s, t}; walks may not pass through t (Def. 5), so
      // edges out of t contribute nothing (none exist in Gq anyway: A(t) = +∞).
      if (u != q.t && u != q.s && v != q.t && !builder.completed(u)) {
        val cand: Array[Int] =
          if (v == q.s) Array(u) // base case TCV_·(s, s) = ∅, so candidate = {u}
          else {
            val base = builder.lastAtOrBefore(v, e.ts - 1)
            if (base == null) null // no walk reaches v before τ: edge carries no paths
            else SortedIntSet.insert(base, u)
          }
        if (cand != null) builder.fold(u, e.ts, cand)
      }
      i += 1
    }
    builder.freezeAscending()
  }

  /** Backward entries `TCV_·(·, t)` over the quick upper-bound graph. */
  def backward(gq: TemporalGraph, q: TspgQuery): TcvSide = {
    val builder = new SideBuilder(gq.n)
    val edges   = gq.edges
    var i = edges.length - 1 // descending ts scan (Algorithm 4 line 24)
    while (i >= 0) {
      val e = edges(i)
      val u = e.src
      val v = e.dst
      if (u != q.s && u != q.t && v != q.s && !builder.completed(u)) {
        val cand: Array[Int] =
          if (v == q.t) Array(u) // base case TCV_·(t, t) = ∅
          else {
            val base = builder.lastAtOrBefore(v, -(e.ts + 1)) // negated-ts ordering
            if (base == null) null
            else SortedIntSet.insert(base, u)
          }
        if (cand != null) builder.fold(u, -e.ts, cand)
      }
      i -= 1
    }
    builder.freezeDescending()
  }

  private val EmptySets: Array[Array[Int]] = Array.empty

  /** Per-vertex growing entry lists with the Lemma 7 completion flag.
    *
    * The backward pass reuses the forward machinery by negating timestamps (a
    * descending scan over `ts` is an ascending scan over `−ts`); `freezeDescending`
    * un-negates and re-sorts ascending for the [[TcvSide]] lookup contract.
    */
  private final class SideBuilder(n: Int) {
    // Buffers are created on first touch: only vertices incident to Gq edges pay, so a
    // query on a huge sparse graph does not allocate n buffer pairs up front.
    private val ts   = new Array[mutable.ArrayBuffer[Int]](n)
    private val sets = new Array[mutable.ArrayBuffer[Array[Int]]](n)
    val completed    = new Array[Boolean](n)

    /** Latest entry of `v` with (possibly negated) timestamp ≤ x, or null. */
    def lastAtOrBefore(v: Int, x: Int): Array[Int] = {
      val t = ts(v)
      if (t == null) return null
      var i = t.length - 1
      while (i >= 0 && t(i) > x) i -= 1
      if (i < 0) null else sets(v)(i)
    }

    /** Fold candidate set into `u`'s entry at `tau` (opening a new entry that inherits
      * the previous one, per the "step i)" reading of Eq. 3), then apply Lemma 7.
      */
    def fold(u: Int, tau: Int, cand: Array[Int]): Unit = {
      if (ts(u) == null) {
        ts(u) = new mutable.ArrayBuffer[Int](4)
        sets(u) = new mutable.ArrayBuffer[Array[Int]](4)
      }
      val tb = ts(u)
      val sb = sets(u)
      if (tb.nonEmpty && tb(tb.length - 1) == tau) {
        sb(sb.length - 1) = SortedIntSet.intersect(sb(sb.length - 1), cand)
      } else {
        val opened = if (tb.isEmpty) cand else SortedIntSet.intersect(sb(sb.length - 1), cand)
        tb += tau
        sb += opened
      }
      val cur = sb(sb.length - 1)
      if (cur.length == 1 && cur(0) == u) completed(u) = true // Lemma 7
    }

    def freezeAscending(): TcvSide =
      new TcvSide(
        ts.map(b => if (b == null) Array.emptyIntArray else b.toArray),
        sets.map(b => if (b == null) EmptySets else b.toArray))

    def freezeDescending(): TcvSide = {
      // Entries were appended in ascending −ts, i.e. descending ts: reverse both.
      val t = ts.map(b => if (b == null) Array.emptyIntArray else b.reverseIterator.map(x => -x).toArray)
      val s = sets.map(b => if (b == null) EmptySets else b.reverseIterator.toArray)
      new TcvSide(t, s)
    }
  }
}

/** Merge-style operations on sorted, duplicate-free Int arrays (TCV sets are tiny —
  * bounded by θ — so allocation-per-op is fine and keeps the code obvious).
  */
object SortedIntSet {

  /** `a ∪ {x}` preserving sort order. */
  def insert(a: Array[Int], x: Int): Array[Int] = {
    var lo = 0
    while (lo < a.length && a(lo) < x) lo += 1
    if (lo < a.length && a(lo) == x) a
    else {
      val r = new Array[Int](a.length + 1)
      System.arraycopy(a, 0, r, 0, lo)
      r(lo) = x
      System.arraycopy(a, lo, r, lo + 1, a.length - lo)
      r
    }
  }

  /** `a ∩ b` of two sorted arrays. */
  def intersect(a: Array[Int], b: Array[Int]): Array[Int] = {
    val out = new mutable.ArrayBuilder.ofInt
    var i = 0
    var j = 0
    while (i < a.length && j < b.length) {
      if (a(i) == b(j)) { out += a(i); i += 1; j += 1 }
      else if (a(i) < b(j)) i += 1
      else j += 1
    }
    out.result()
  }

  /** True iff `a ∩ b ≠ ∅`. */
  def intersects(a: Array[Int], b: Array[Int]): Boolean = {
    var i = 0
    var j = 0
    while (i < a.length && j < b.length) {
      if (a(i) == b(j)) return true
      else if (a(i) < b(j)) i += 1
      else j += 1
    }
    false
  }
}

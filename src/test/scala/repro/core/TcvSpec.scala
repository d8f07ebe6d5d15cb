package repro.core

import repro.SparkSpec

class TcvSpec extends SparkSpec {
  import PaperExample._

  private val gq  = QuickUbg.compute(graph, query)
  private val fwd = Tcv.forward(gq, query)
  private val bwd = Tcv.backward(gq, query)

  // ---- Fig. 4(a): forward entries --------------------------------------------------

  test("Fig. 4(a): TCV_2(s,b) = {b}") { assert(fwd.entries(b) == Seq((2, Set(b)))) }

  test("Lemma 7 pruning: b is completed at ts=2, entry at in-ts 5 is not stored") {
    assert(fwd.entries(b).size == 1)
  }

  test("Fig. 4(a): TCV_3(s,c) = {b,c} and TCV_6(s,c) = {b,c}") {
    assert(fwd.entries(c) == Seq((3, Set(b, c)), (6, Set(b, c))))
  }

  test("Fig. 4(a): TCV_4(s,f) = {b,c,f}") { assert(fwd.entries(f) == Seq((4, Set(b, c, f)))) }

  test("Fig. 4(a): TCV_5(s,e) = {b,c,f,e}") { assert(fwd.entries(e) == Seq((5, Set(b, c, f, e)))) }

  test("s and t have no forward entries") {
    assert(fwd.entries(s).isEmpty && fwd.entries(t).isEmpty)
  }

  // ---- Fig. 4(b): backward entries -------------------------------------------------

  test("Fig. 4(b): TCV_6(b,t) = {b}, earlier entry pruned by Lemma 7") {
    assert(bwd.entries(b) == Seq((6, Set(b))))
  }

  test("Fig. 4(b): TCV_7(c,t) = {c}, entry at out-ts 4 pruned") {
    assert(bwd.entries(c) == Seq((7, Set(c))))
  }

  test("Example 7: TCV_5(f,t) = {c,e,f} then intersected down to {f}") {
    assert(bwd.entries(f) == Seq((5, Set(f))))
  }

  test("Fig. 4(b): TCV_6(e,t) = {c,e}") { assert(bwd.entries(e) == Seq((6, Set(c, e)))) }

  // ---- Lemma 5 lookups -------------------------------------------------------------

  test("atOrBefore falls back to the previous entry (Lemma 5)") {
    assert(fwd.atOrBefore(c, 5).toSet == Set(b, c)) // TCV_5(s,c) = TCV_3(s,c)
    assert(fwd.atOrBefore(c, 3).toSet == Set(b, c))
  }

  test("atOrBefore before the first entry is null (no qualifying path)") {
    assert(fwd.atOrBefore(c, 2) == null)
    assert(fwd.atOrBefore(f, 3) == null)
  }

  test("atOrBefore into a pruned region returns the completion entry {u}") {
    assert(fwd.atOrBefore(b, 6).toSet == Set(b)) // conceptual TCV_5(s,b) = {b}
  }

  test("atOrAfter returns the next entry (Lemma 5, backward)") {
    assert(bwd.atOrAfter(e, 5).toSet == Set(c, e)) // TCV_5(e,t) = TCV_6(e,t)
    assert(bwd.atOrAfter(e, 6).toSet == Set(c, e))
  }

  test("atOrAfter past the last entry is null") {
    assert(bwd.atOrAfter(e, 7) == null)
    assert(bwd.atOrAfter(f, 6) == null)
  }

  test("atOrAfter into a pruned region returns the completion entry {u}") {
    assert(bwd.atOrAfter(c, 3).toSet == Set(c)) // conceptual TCV_4(c,t) = {c}
  }

  // ---- SortedIntSet ----------------------------------------------------------------

  test("SortedIntSet.insert keeps order and idempotence") {
    assert(SortedIntSet.insert(Array(1, 3, 5), 4).toSeq == Seq(1, 3, 4, 5))
    assert(SortedIntSet.insert(Array(1, 3, 5), 3).toSeq == Seq(1, 3, 5))
    assert(SortedIntSet.insert(Array.empty[Int], 2).toSeq == Seq(2))
    assert(SortedIntSet.insert(Array(2, 3), 1).toSeq == Seq(1, 2, 3))
    assert(SortedIntSet.insert(Array(2, 3), 9).toSeq == Seq(2, 3, 9))
  }

  test("SortedIntSet.intersect / intersects") {
    assert(SortedIntSet.intersect(Array(1, 2, 4, 6), Array(2, 3, 6)).toSeq == Seq(2, 6))
    assert(SortedIntSet.intersect(Array(1, 2), Array(3, 4)).isEmpty)
    assert(SortedIntSet.intersects(Array(1, 5, 9), Array(0, 9)))
    assert(!SortedIntSet.intersects(Array(1, 5), Array(2, 6)))
    assert(!SortedIntSet.intersects(Array.empty[Int], Array(1)))
  }

  // ---- Reference cross-validation (Def. 5 via brute force, Lemma 6 equivalence) ----

  for (seed <- 1 to 12)
    test(s"TCV lookups match brute-force Def. 5 (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed, n = 8, m = 25, maxTs = 6)
      Fixtures.randomQueries(g, seed + 3, 2, maxTs = 6).foreach { q =>
        val gqr = QuickUbg.compute(g, q)
        val fw  = Tcv.forward(gqr, q)
        val bw  = Tcv.backward(gqr, q)
        for (u <- 0 until g.n if u != q.s && u != q.t; tau <- q.tauB to q.tauE) {
          val refF = TestRef.refTcvForward(gqr, q, u, tau)
          val gotF = Option(fw.atOrBefore(u, tau)).map(_.toSet)
          assert(gotF == refF, s"TCV_$tau(s, $u) mismatch for $q: got $gotF ref $refF")
          val refB = TestRef.refTcvBackward(gqr, q, u, tau)
          val gotB = Option(bw.atOrAfter(u, tau)).map(_.toSet)
          assert(gotB == refB, s"TCV_$tau($u, t) mismatch for $q: got $gotB ref $refB")
        }
      }
    }
}

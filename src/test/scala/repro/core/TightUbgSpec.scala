package repro.core

import repro.SparkSpec

class TightUbgSpec extends SparkSpec {
  import PaperExample._

  private val gq = QuickUbg.compute(graph, query)
  private val gt = TightUbg.compute(gq, query)

  test("Fig. 4(c): Gt of the paper example has exactly 5 edges") {
    assert(gt.edgeSet == gtEdges)
  }

  test("edges out of s and into t bypass the check (Lemma 2)") {
    assert(gt.contains(TEdge(s, b, 2)))
    assert(gt.contains(TEdge(b, t, 6)))
    assert(gt.contains(TEdge(c, t, 7)))
  }

  test("Example 8: e(c,f,4) kept because TCV_3(s,c) ∩ TCV_5(f,t) = {b,c} ∩ {f} = ∅") {
    assert(gt.contains(TEdge(c, f, 4)))
  }

  test("e(f,e,5) excluded: TCV_4(s,f) ∩ TCV_6(e,t) = {b,c,f} ∩ {c,e} = {c}") {
    assert(!gt.contains(TEdge(f, e, 5)))
  }

  test("e(f,b,5) excluded: TCV_4(s,f) ∩ TCV_6(b,t) = {b,c,f} ∩ {b} = {b}") {
    assert(!gt.contains(TEdge(f, b, 5)))
  }

  test("e(e,c,6) excluded: TCV_5(s,e) ∩ TCV_7(c,t) = {b,c,f,e} ∩ {c} = {c}") {
    assert(!gt.contains(TEdge(e, c, 6)))
  }

  test("containment chain: tspG ⊆ Gt ⊆ Gq on the paper example") {
    assert(tspgEdges.subsetOf(gt.edgeSet) && gt.edgeSet.subsetOf(gq.edgeSet))
  }

  test("Gt on an already-exact graph is a no-op") {
    // A single path graph: everything is in tspG, nothing may be pruned.
    val g  = TemporalGraph(4, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 3, 3)))
    val q  = TspgQuery(0, 3, 1, 3)
    val g2 = TightUbg.compute(QuickUbg.compute(g, q), q)
    assert(g2.m == 3)
  }

  test("Lemma 3 is necessary-only: Gt may strictly contain tspG") {
    // e(c,f,4) passes the TCV test but lies on no temporal simple path (the paper's
    // counterexample in the proof of Lemma 3).
    assert(gt.contains(TEdge(c, f, 4)) && !tspgEdges.contains(TEdge(c, f, 4)))
  }

  for (seed <- 1 to 20)
    test(s"tspG ⊆ Gt ⊆ Gq and Lemma 9 characterization (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed)
      Fixtures.randomQueries(g, seed + 11, 3).foreach { q =>
        val gqr  = QuickUbg.compute(g, q)
        val gtr  = TightUbg.compute(gqr, q)
        val ref  = TestRef.tspg(g, q)
        assert(ref.edges.subsetOf(gtr.edgeSet), s"tspG ⊄ Gt for $q")
        assert(gtr.edgeSet.subsetOf(gqr.edgeSet), s"Gt ⊄ Gq for $q")
        // Lemma 9, checked against brute-force TCV values.
        gqr.edges.foreach { edge =>
          val expected =
            if (edge.src == q.s || edge.dst == q.t) true
            else {
              val fl = TestRef.refTcvForward(gqr, q, edge.src, edge.ts - 1)
              val bl = TestRef.refTcvBackward(gqr, q, edge.dst, edge.ts + 1)
              fl.isDefined && bl.isDefined && (fl.get intersect bl.get).isEmpty
            }
          assert(gtr.contains(edge) == expected, s"Lemma 9 mismatch on $edge for $q")
        }
      }
    }
}

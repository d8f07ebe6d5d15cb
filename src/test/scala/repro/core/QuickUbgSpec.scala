package repro.core

import repro.SparkSpec

class QuickUbgSpec extends SparkSpec {
  import PaperExample._

  private val gq = QuickUbg.compute(graph, query)

  test("Fig. 3(c): Gq of the paper example has exactly 8 edges") {
    assert(gq.edgeSet == gqEdges)
  }

  test("Example 4: e(s,a,3) excluded because D(a) = -infinity < 3") {
    assert(!gq.contains(TEdge(s, a, 3)))
  }

  test("Example 4: e(d,t,2) excluded because A(d) = 3 > 2") {
    assert(!gq.contains(TEdge(d, t, 2)))
  }

  test("e(b,f,5) excluded: arrival at f at 5 cannot depart (D(f) = 5)") {
    assert(!gq.contains(TEdge(b, f, 5)))
  }

  test("e(f,b,5) kept: A(f)=4 < 5 < D(b)=6") {
    assert(gq.contains(TEdge(f, b, 5)))
  }

  test("Gq is a subgraph of the window projection") {
    assert(gq.edgeSet.subsetOf(Baselines.dtTsg(graph, query).edgeSet))
  }

  test("Gq contains the tspG of the paper example") {
    assert(tspgEdges.subsetOf(gq.edgeSet))
  }

  test("Gq vertex universe is preserved") { assert(gq.n == graph.n) }

  test("empty window far from any timestamp yields empty Gq") {
    val q2 = TspgQuery(s, t, 100, 110)
    assert(QuickUbg.compute(graph, q2).m == 0)
  }

  test("single-edge s->t graph: the edge survives") {
    val g = TemporalGraph(2, Seq(TEdge(0, 1, 3)))
    assert(QuickUbg.compute(g, TspgQuery(0, 1, 1, 5)).m == 1)
  }

  test("edge out of window is dropped even between reachable endpoints") {
    val g = TemporalGraph(2, Seq(TEdge(0, 1, 3), TEdge(0, 1, 9)))
    assert(QuickUbg.compute(g, TspgQuery(0, 1, 1, 5)).edgeSet == Set(TEdge(0, 1, 3)))
  }

  for (seed <- 1 to 15)
    test(s"Gq characterization vs reference (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed)
      Fixtures.randomQueries(g, seed + 7, 3).foreach { q =>
        val got = QuickUbg.compute(g, q).edgeSet
        // Lemma 1 with Algorithm 3's avoidance: e(u,v,τ) ∈ Gq iff a simple path
        // s→u avoiding t arrives before τ AND a simple path v→t avoiding s departs
        // after τ (prefix/suffix of any witness s→t path qualify).
        val expected = g.edgeSet.filter { e =>
          val okA =
            if (e.src == q.t) false // A(t) stays +infinity: traversal never enters t
            else if (e.src == q.s) e.ts >= q.tauB
            else TestRef.refArrival(g, q.s, e.src, q.tauB, q.tauE, avoid = q.t).exists(_ < e.ts)
          val okD =
            if (e.dst == q.s) false // D(s) stays -infinity: traversal never enters s
            else if (e.dst == q.t) e.ts <= q.tauE
            else TestRef.refDeparture(g, e.dst, q.t, q.tauB, q.tauE, avoid = q.s).exists(_ > e.ts)
          okA && okD && e.ts >= q.tauB && e.ts <= q.tauE
        }
        assert(got == expected, s"Gq mismatch for $q")
        // And it upper-bounds the true tspG.
        assert(TestRef.tspg(g, q).edges.subsetOf(got))
      }
    }
}

package repro.core

import repro.SparkSpec

class BaselinesSpec extends SparkSpec {
  import PaperExample._

  test("dtTSG is the window projection") {
    val g2 = Baselines.dtTsg(graph, query)
    assert(g2.edgeSet == graph.edgeSet.filter(e => e.ts >= 2 && e.ts <= 7))
    assert(g2.m == 14) // all paper-example timestamps lie inside [2,7]
  }

  test("dtTSG drops out-of-window edges") {
    val g2 = Baselines.dtTsg(graph, TspgQuery(s, t, 3, 5))
    assert(g2.edges.forall(e => e.ts >= 3 && e.ts <= 5) && g2.m == 9)
  }

  test("esTSG is contained in dtTSG and contains tgTSG (Fig. 2 ordering)") {
    val dt = Baselines.dtTsg(graph, query).edgeSet
    val es = Baselines.esTsg(graph, query).edgeSet
    val tg = Baselines.tgTsg(graph, query).edgeSet
    assert(es.subsetOf(dt) && tg.subsetOf(es))
  }

  test("esTSG keeps non-decreasing-only edges that tgTSG prunes") {
    // 0 -3-> 1 -3-> 2: a non-decreasing walk but not a strictly ascending one.
    val g = TemporalGraph(3, Seq(TEdge(0, 1, 3), TEdge(1, 2, 3)))
    val q = TspgQuery(0, 2, 1, 5)
    assert(Baselines.esTsg(g, q).m == 2 && Baselines.tgTsg(g, q).m == 0)
  }

  test("esTSG prunes edges on no non-decreasing s~t walk") {
    // 1 -2-> 2 cannot be preceded from s (its only in-edge arrives later).
    val g = TemporalGraph(4, Seq(TEdge(0, 1, 5), TEdge(1, 2, 2), TEdge(2, 3, 6),
      TEdge(0, 3, 1)))
    val es = Baselines.esTsg(g, TspgQuery(0, 3, 1, 6))
    assert(!es.edgeSet.contains(TEdge(1, 2, 2)))
    assert(es.edgeSet.contains(TEdge(0, 3, 1)))
  }

  test("tgTSG equals QuickUBG on the paper example (§IV-A discussion)") {
    assert(Baselines.tgTsg(graph, query).edgeSet == gqEdges)
  }

  test("EPdtTSG produces the exact tspG on the paper example") {
    assert(Baselines.epDtTsg(graph, query).subgraph.edges == tspgEdges)
  }

  test("EPesTSG produces the exact tspG on the paper example") {
    assert(Baselines.epEsTsg(graph, query).subgraph.edges == tspgEdges)
  }

  test("EPtgTSG produces the exact tspG on the paper example") {
    assert(Baselines.epTgTsg(graph, query).subgraph.edges == tspgEdges)
  }

  test("EP caps propagate from the enumeration stage") {
    val r = Baselines.epDtTsg(graph, query, maxPaths = 1)
    assert(!r.complete && r.pathCount == 1)
  }

  for (seed <- 1 to 20)
    test(s"reduction chain and EP agreement (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed)
      Fixtures.randomQueries(g, seed + 29, 3).foreach { q =>
        val dt = Baselines.dtTsg(g, q).edgeSet
        val es = Baselines.esTsg(g, q).edgeSet
        val tg = Baselines.tgTsg(g, q).edgeSet
        val gq = QuickUbg.compute(g, q).edgeSet
        assert(es.subsetOf(dt), s"es ⊄ dt for $q")
        assert(tg.subsetOf(es), s"tg ⊄ es for $q")
        assert(tg == gq, s"tgTSG ≠ QuickUBG for $q")
        val ref = TestRef.tspg(g, q)
        assert(Baselines.epDtTsg(g, q).subgraph == ref, s"EPdt mismatch for $q")
        assert(Baselines.epEsTsg(g, q).subgraph == ref, s"EPes mismatch for $q")
        assert(Baselines.epTgTsg(g, q).subgraph == ref, s"EPtg mismatch for $q")
      }
    }
}

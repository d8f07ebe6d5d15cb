package repro.dist

import repro.core._

class DistQuickUbgSpec extends DistSpecBase {
  import PaperExample._

  test("Gq on the paper example matches Fig. 3(c)") {
    val got = GraphDF.toEdgeSet(DistQuickUbg.compute(spark, df(graph), query))
    assert(got == gqEdges)
  }

  test("Gq from precomputed label tables equals the fused pipeline") {
    val e = df(graph)
    val a = DistPolarity.arrivals(spark, e, query)
    val d = DistPolarity.departures(spark, e, query)
    assert(GraphDF.toEdgeSet(DistQuickUbg(e, a, d)) ==
      GraphDF.toEdgeSet(DistQuickUbg.compute(spark, e, query)))
  }

  test("empty window yields an empty Gq") {
    val got = DistQuickUbg.compute(spark, df(graph), TspgQuery(s, t, 100, 110))
    assert(got.count() == 0)
  }

  for (seed <- 1 to 5)
    test(s"dist Gq equals core Gq (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 17L, n = 9, m = 30)
      Fixtures.randomQueries(g, seed + 5, 2).foreach { q =>
        val got = GraphDF.toEdgeSet(DistQuickUbg.compute(spark, df(g), q))
        assert(got == QuickUbg.compute(g, q).edgeSet, s"Gq mismatch for $q")
      }
    }
}

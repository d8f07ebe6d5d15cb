package repro.dist

import repro.core._

class DistTightUbgSpec extends DistSpecBase {
  import PaperExample._

  test("Gt on the paper example matches Fig. 4(c)") {
    val gq  = DistQuickUbg.compute(spark, df(graph), query)
    val got = GraphDF.toEdgeSet(DistTightUbg.compute(spark, gq, query))
    assert(got == gtEdges)
  }

  test("edges out of s / into t are kept without entry lookups") {
    val gq  = DistQuickUbg.compute(spark, df(graph), query)
    val got = GraphDF.toEdgeSet(DistTightUbg.compute(spark, gq, query))
    assert(got.contains(TEdge(s, b, 2)) && got.contains(TEdge(c, t, 7)))
  }

  for (seed <- 1 to 5)
    test(s"dist Gt equals core Gt (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 23L, n = 9, m = 30, maxTs = 6)
      Fixtures.randomQueries(g, seed + 13, 1, maxTs = 6).foreach { q =>
        val coreGq = QuickUbg.compute(g, q)
        val got    = GraphDF.toEdgeSet(DistTightUbg.compute(spark, df(coreGq), q))
        assert(got == TightUbg.compute(coreGq, q).edgeSet, s"Gt mismatch for $q")
      }
    }
}

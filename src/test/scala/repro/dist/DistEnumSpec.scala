package repro.dist

import repro.core._

class DistEnumSpec extends DistSpecBase {
  import PaperExample._

  test("distributed enumeration yields the tspG edges of the paper example") {
    val got = GraphDF.toEdgeSet(DistEnum.tspgEdges(spark, df(graph), query))
    assert(got == tspgEdges)
  }

  test("empty result when the target is unreachable") {
    val got = DistEnum.tspgEdges(spark, df(graph), TspgQuery(a, s, 2, 7))
    assert(got.count() == 0)
  }

  test("paths do not extend past t") {
    val g = TemporalGraph(3, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 0, 3)))
    val got = GraphDF.toEdgeSet(DistEnum.tspgEdges(spark, df(g), TspgQuery(0, 2, 1, 5)))
    assert(got == Set(TEdge(0, 1, 1), TEdge(1, 2, 2)))
  }

  test("direct s->t edge in a single-timestamp window") {
    val g = TemporalGraph(2, Seq(TEdge(0, 1, 4)))
    val got = GraphDF.toEdgeSet(DistEnum.tspgEdges(spark, df(g), TspgQuery(0, 1, 4, 4)))
    assert(got == Set(TEdge(0, 1, 4)))
  }

  for (seed <- 1 to 4)
    test(s"distributed enumeration equals brute force (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 29L, n = 8, m = 24, maxTs = 5)
      Fixtures.randomQueries(g, seed + 19, 1, maxTs = 5).foreach { q =>
        val got = GraphDF.toEdgeSet(DistEnum.tspgEdges(spark, df(g), q))
        assert(got == TestRef.tspg(g, q).edges, s"mismatch for $q")
      }
    }
}

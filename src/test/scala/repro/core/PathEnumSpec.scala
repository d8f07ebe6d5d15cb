package repro.core

import repro.SparkSpec

class PathEnumSpec extends SparkSpec {
  import PaperExample._

  test("Example 1: exactly two temporal simple paths from s to t within [2,7]") {
    val r = PathEnum.run(graph, query)
    assert(r.pathCount == 2 && r.complete)
  }

  test("the naive method forms the tspG of Fig. 1(c)") {
    val r = PathEnum.run(graph, query)
    assert(r.subgraph.edges == tspgEdges && r.subgraph.vertices == tspgVertices)
  }

  test("paths never extend past t (simple paths end at the target)") {
    // t has an out-edge back into the graph; it must not create extra paths.
    val g = TemporalGraph(3, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 0, 3)))
    val r = PathEnum.run(g, TspgQuery(0, 2, 1, 5))
    assert(r.pathCount == 1 && r.subgraph.edges == Set(TEdge(0, 1, 1), TEdge(1, 2, 2)))
  }

  test("strict ascent is enforced during the DFS") {
    val g = TemporalGraph(3, Seq(TEdge(0, 1, 2), TEdge(1, 2, 2)))
    assert(PathEnum.run(g, TspgQuery(0, 2, 1, 5)).pathCount == 0)
  }

  test("window bounds are enforced during the DFS") {
    val g = TemporalGraph(3, Seq(TEdge(0, 1, 1), TEdge(1, 2, 9)))
    assert(PathEnum.run(g, TspgQuery(0, 2, 1, 5)).pathCount == 0)
    assert(PathEnum.run(g, TspgQuery(0, 2, 1, 9)).pathCount == 1)
  }

  test("no path: empty result, complete = true") {
    val r = PathEnum.run(graph, TspgQuery(a, s, 2, 7))
    assert(r.pathCount == 0 && r.subgraph.isEmpty && r.complete)
  }

  test("path count cap fires and marks the run incomplete") {
    val r = PathEnum.run(graph, query, maxPaths = 1)
    assert(r.pathCount == 1 && !r.complete)
  }

  test("vertex-disjoint diamond yields four paths") {
    val es = Seq(TEdge(0, 1, 1), TEdge(0, 2, 1), TEdge(1, 3, 2), TEdge(2, 3, 2),
      TEdge(3, 4, 3), TEdge(3, 5, 3), TEdge(4, 6, 4), TEdge(5, 6, 4))
    val g = TemporalGraph(7, es)
    assert(PathEnum.run(g, TspgQuery(0, 6, 1, 4)).pathCount == 4)
  }

  test("simplicity: a revisiting cycle contributes no path") {
    // 0->1->2->1 revisits 1; only the direct continuation counts.
    val g = TemporalGraph(4, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 1, 3),
      TEdge(2, 3, 4)))
    val r = PathEnum.run(g, TspgQuery(0, 3, 1, 5))
    assert(r.pathCount == 1 && !r.subgraph.edges.contains(TEdge(2, 1, 3)))
  }

  test("countPaths agrees with run") {
    assert(PathEnum.countPaths(graph, query) == ((2L, true)))
  }

  for (seed <- 1 to 15)
    test(s"enumeration matches the independent reference (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed, n = 9, m = 30)
      Fixtures.randomQueries(g, seed + 23, 3).foreach { q =>
        val got = PathEnum.run(g, q)
        val refPaths = TestRef.allPaths(g, q.s, q.t, q.tauB, q.tauE)
        assert(got.pathCount == refPaths.size, s"path count mismatch for $q")
        assert(got.subgraph == TestRef.tspg(g, q), s"subgraph mismatch for $q")
      }
    }
}

package repro.core

import repro.SparkSpec

/** Walks through every numbered example of the paper on the reconstructed Fig. 1(a)
  * graph — a high-confidence check that both the reconstruction and the algorithms
  * agree with the authors' own traces.
  */
class RunningExampleSpec extends SparkSpec {
  import PaperExample._

  test("Example 1: the two temporal simple paths within [2,7]") {
    val paths = TestRef.allPaths(graph, s, t, 2, 7).map(_.toList).toSet
    assert(paths == Set(
      List(TEdge(s, b, 2), TEdge(b, t, 6)),
      List(TEdge(s, b, 2), TEdge(b, c, 3), TEdge(c, t, 7))))
  }

  test("Example 1: both paths share e(s,b,2)") {
    val paths = TestRef.allPaths(graph, s, t, 2, 7)
    assert(paths.forall(_.contains(TEdge(s, b, 2))))
  }

  test("Example 3: P_[2,7](s,f) is the stated pair of paths") {
    val paths = TestRef.allPaths(graph, s, f, 2, 7, avoid = t).map(_.toList).toSet
    assert(paths == Set(
      List(TEdge(s, b, 2), TEdge(b, f, 5)),
      List(TEdge(s, b, 2), TEdge(b, c, 3), TEdge(c, f, 4))))
  }

  test("Example 3: A(f) = min{4, 5} = 4") {
    assert(PolarityTime.arrivals(graph, query)(f) == 4)
  }

  test("Example 3: P_[2,7](f,t) is the stated pair of paths") {
    val paths = TestRef.allPaths(graph, f, t, 2, 7, avoid = s).map(_.toList).toSet
    assert(paths == Set(
      List(TEdge(f, e, 5), TEdge(e, c, 6), TEdge(c, t, 7)),
      List(TEdge(f, b, 5), TEdge(b, t, 6))))
  }

  test("Example 3: D(f) = 5") {
    assert(PolarityTime.departures(graph, query)(f) == 5)
  }

  test("Example 5: s's out-neighbors are {(b,2),(a,3),(d,4)}") {
    assert(graph.outEdges(s).map(e => (e.dst, e.ts)).toSet == Set((b, 2), (a, 3), (d, 4)))
  }

  test("Example 5: A(d) improves from 4 to 3 via b") {
    assert(PolarityTime.arrivals(graph, query)(d) == 3)
  }

  test("Example 6: T_out(f, Gq) = {5} so TCV.(f,t) has a single entry") {
    val gq = QuickUbg.compute(graph, query)
    assert(gq.outEdges(f).map(_.ts).distinct.toSeq == Seq(5))
    assert(Tcv.backward(gq, query).entries(f).map(_._1) == Seq(5))
  }

  test("Example 6: N_out(f, Gq) = {(b,5),(e,5)}") {
    val gq = QuickUbg.compute(graph, query)
    assert(gq.outEdges(f).map(e => (e.dst, e.ts)).toSet == Set((b, 5), (e, 5)))
  }

  test("Lemma 3 counterexample: only (τi,τj) = (3,5) brackets e(c,f,4), and the TCVs are disjoint") {
    val gq = QuickUbg.compute(graph, query)
    assert(TestRef.refTcvForward(gq, query, c, 3).contains(Set(b, c)))
    assert(TestRef.refTcvBackward(gq, query, f, 5).contains(Set(f)))
    // ... yet no temporal simple path passes through it:
    assert(TestRef.allPaths(graph, s, t, 2, 7).forall(!_.contains(TEdge(c, f, 4))))
  }

  test("full pipeline sizes: |E(G)|=14, |E(Gq)|=8, |E(Gt)|=5, |E(tspG)|=4") {
    val r = Vug.run(graph, query)
    assert(graph.m == 14 && r.gq.m == 8 && r.gt.m == 5 && r.tspg.edgeCount == 4)
  }

  test("upper-bound ratios on the example: dt 4/14, Gq 4/8, Gt 4/5") {
    val r  = Vug.run(graph, query)
    val dt = Baselines.dtTsg(graph, query)
    assert(math.abs(100.0 * r.tspg.edgeCount / dt.m - 28.6) < 0.1)
    assert(100.0 * r.tspg.edgeCount / r.gq.m == 50.0)
    assert(100.0 * r.tspg.edgeCount / r.gt.m == 80.0)
  }
}

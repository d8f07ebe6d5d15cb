package repro.data

import repro.SparkSpec
import repro.core._

class WorkloadSpec extends SparkSpec {

  private val g = Fixtures.randomGraph(5L, n = 20, m = 120, maxTs = 12)

  test("workload is deterministic in its seed") {
    val a = Workload.queries(g, theta = 5, count = 10, seed = 3)
    val b = Workload.queries(g, theta = 5, count = 10, seed = 3)
    assert(a == b)
  }

  test("different seeds differ") {
    assert(Workload.queries(g, 5, 10, 3) != Workload.queries(g, 5, 10, 4))
  }

  test("requested count is produced") {
    assert(Workload.queries(g, 5, 25, 1).size == 25)
  }

  test("every query has the requested span") {
    assert(Workload.queries(g, 7, 10, 2).forall(_.theta == 7))
  }

  test("tauB is drawn from the graph's timestamps") {
    val ts = g.timestamps.toSet
    assert(Workload.queries(g, 5, 10, 6).forall(q => ts.contains(q.tauB)))
  }

  test("every query is temporally satisfiable: non-empty tspG (paper protocol)") {
    Workload.queries(g, 6, 15, 9).foreach { q =>
      assert(Vug.tspg(g, q).edgeCount > 0, s"empty tspG for $q")
    }
  }

  test("s and t always differ") {
    assert(Workload.queries(g, 5, 20, 11).forall(q => q.s != q.t))
  }

  test("workload on an empty graph is rejected") {
    intercept[IllegalArgumentException](
      Workload.queries(TemporalGraph(3, Seq.empty), 5, 1, 1))
  }

  test("transit-shaped graph (Exp-8 stand-in): tspG lists the transfer options") {
    // A toy timetable shaped like the SFMTA case study: stops A=0..E=4, "buses" as
    // timestamped hops, query "A to E within [1, 9]". Two itineraries exist (direct
    // line via B-C, and a transfer via D); the late departure via ts=8 misses the
    // connection at C, so its edge is excluded — exactly the semantics the paper
    // illustrates with missed buses.
    val es = Seq(
      TEdge(0, 1, 1), TEdge(0, 1, 8), // A→B departures at 1 and 8
      TEdge(1, 2, 3),                 // B→C at 3 (the 8 o'clock bus misses it)
      TEdge(2, 4, 5),                 // C→E at 5
      TEdge(0, 3, 2), TEdge(3, 4, 7), // A→D at 2, D→E at 7
    )
    val g2 = TemporalGraph(5, es)
    val r  = Vug.tspg(g2, TspgQuery(0, 4, 1, 9))
    assert(r.edges == Set(TEdge(0, 1, 1), TEdge(1, 2, 3), TEdge(2, 4, 5),
      TEdge(0, 3, 2), TEdge(3, 4, 7)))
    assert(!r.edges.contains(TEdge(0, 1, 8)))
    assert(r.vertices == Set(0, 1, 2, 3, 4))
  }
}

package repro.dist

import repro.core._

class DistPolaritySpec extends DistSpecBase {
  import PaperExample._

  private def coreArrivalMap(g: TemporalGraph, q: TspgQuery): Map[Int, Int] = {
    val a = PolarityTime.arrivals(g, q)
    (0 until g.n).collect { case u if a(u) != PolarityTime.NoArrival => u -> a(u) }.toMap
  }

  private def coreDepartureMap(g: TemporalGraph, q: TspgQuery): Map[Int, Int] = {
    val d = PolarityTime.departures(g, q)
    (0 until g.n).collect { case u if d(u) != PolarityTime.NoDeparture => u -> d(u) }.toMap
  }

  test("arrivals on the paper example match Fig. 3(a)") {
    val got = labelMap(DistPolarity.arrivals(spark, df(graph), query))
    assert(got == Map(s -> 1, b -> 2, a -> 3, d -> 3, c -> 3, f -> 4, e -> 5))
  }

  test("departures on the paper example match Fig. 3(b)") {
    val got = labelMap(DistPolarity.departures(spark, df(graph), query))
    assert(got == Map(t -> 8, b -> 6, c -> 7, d -> 2, f -> 5, e -> 6))
  }

  test("unreachable vertices are absent (A = +inf as a missing row)") {
    val got = labelMap(DistPolarity.arrivals(spark, df(graph), query))
    assert(!got.contains(t)) // traversal never enters t
  }

  test("arrival label table contains the s convention row") {
    val got = labelMap(DistPolarity.arrivals(spark, df(graph), query))
    assert(got(s) == query.tauB - 1)
  }

  test("single-edge graph") {
    val g = TemporalGraph(2, Seq(TEdge(0, 1, 3)))
    val q = TspgQuery(0, 1, 1, 5)
    // A(t) is never assigned either (the forward traversal avoids t).
    assert(labelMap(DistPolarity.arrivals(spark, df(g), q)) == Map(0 -> 0))
    // D(s) is never assigned (the backward traversal avoids s; edges out of s are
    // gated by A(s) instead), so only the t convention row remains.
    assert(labelMap(DistPolarity.departures(spark, df(g), q)) == Map(1 -> 6))
  }

  for (seed <- 1 to 5)
    test(s"dist polarity equals core (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 13L, n = 9, m = 30)
      Fixtures.randomQueries(g, seed, 2).foreach { q =>
        assert(labelMap(DistPolarity.arrivals(spark, df(g), q)) == coreArrivalMap(g, q),
          s"arrivals mismatch for $q")
        assert(labelMap(DistPolarity.departures(spark, df(g), q)) == coreDepartureMap(g, q),
          s"departures mismatch for $q")
      }
    }
}

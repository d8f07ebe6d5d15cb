package repro.dist

import repro.core._
import repro.data.{Datasets, Workload}

class DistVugSpec extends DistSpecBase {
  import PaperExample._

  test("end-to-end pipeline on the paper example") {
    val r = DistVug.run(spark, df(graph), query)
    assert(GraphDF.toEdgeSet(r.gq) == gqEdges)
    assert(GraphDF.toEdgeSet(r.gt) == gtEdges)
    assert(r.tspg.edges == tspgEdges && r.tspg.vertices == tspgVertices)
    assert(GraphDF.toEdgeSet(r.tspgEdges) == tspgEdges)
  }

  test("phase timings are populated") {
    val tm = DistVug.run(spark, df(graph), query).timings
    assert(tm.quickNanos > 0 && tm.tightNanos > 0 && tm.eevNanos >= 0)
  }

  test("distributed pipeline agrees with the distributed enumeration on Gt") {
    val r = DistVug.run(spark, df(graph), query)
    val viaEnum = GraphDF.toEdgeSet(DistEnum.tspgEdges(spark, r.gt, query))
    assert(viaEnum == r.tspg.edges)
  }

  for (seed <- 1 to 4)
    test(s"distributed VUG equals core VUG (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 37L, n = 9, m = 30, maxTs = 6)
      Fixtures.randomQueries(g, seed + 23, 1, maxTs = 6).foreach { q =>
        val got = DistVug.run(spark, df(g), q)
        val ref = Vug.run(g, q)
        assert(GraphDF.toEdgeSet(got.gq) == ref.gq.edgeSet, s"Gq mismatch for $q")
        assert(GraphDF.toEdgeSet(got.gt) == ref.gt.edgeSet, s"Gt mismatch for $q")
        assert(got.tspg == ref.tspg, s"tspG mismatch for $q")
      }
    }

  test("integration: distributed VUG on a generated dataset query") {
    // A scaled-down R1-shaped graph keeps the Spark-side integration fast while still
    // exercising hub structure, parallel edges, and a θ=10 window.
    val edges = repro.SynthData.temporalEdges(spark, nVertices = 60, nEdges = 900,
      nTimestamps = 40, alpha = 1.05, seed = 42)
    val g = GraphDF.toCore(edges, n = 61)
    val q = Workload.queries(g, theta = 10, count = 1, seed = 7).head
    val got = DistVug.run(spark, edges, q)
    val ref = Vug.run(g, q)
    assert(got.tspg == ref.tspg)
    assert(ref.tspg.edgeCount > 0) // workload guarantees temporal reachability
  }

  test("dataset catalog is well-formed") {
    assert(Datasets.all.map(_.id) == (1 to 10).map(i => s"R$i"))
    assert(Datasets.byId("R3").paperId.startsWith("D3"))
    intercept[RuntimeException](Datasets.byId("R99"))
  }
}

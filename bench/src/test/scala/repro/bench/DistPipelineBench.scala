package repro.bench

import repro.SparkSpec
import repro.core.Vug
import repro.data.Datasets
import repro.dist.{DistVug, GraphDF}

/** Benchmarks the distributed dataflow pipeline (DESIGN.md §2.2): per-phase wall
  * clock of DistPolarity→DistQuickUbg→DistTcv→DistTightUbg→EEV on a mid-size
  * dataset, with end-to-end agreement against the core implementation.
  *
  * Not a paper table -- it documents the dataflow substitution's overhead profile
  * (per-round job latency dominates at this scale; the value of the dataflow form is
  * horizontal scale, not laptop latency).
  */
class DistPipelineBench extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  test("distributed pipeline: agreement and phase profile on R5") {
    val spec  = Datasets.byId("R5")
    val g     = BenchData.graph(spec)
    val edges = GraphDF.fromCore(spark, g).cache()
    edges.count()
    val qs = BenchData.queries(spec, 3)
    val rows = qs.map { q =>
      val (distR, distN) = BenchUtil.timed(DistVug.run(spark, edges, q))
      val (coreR, coreN) = BenchUtil.timed(Vug.run(g, q))
      assert(distR.tspg == coreR.tspg, s"dist != core on $q")
      assert(GraphDF.toEdgeSet(distR.gt) == coreR.gt.edgeSet)
      Seq(s"(${q.s}->${q.t},[${q.tauB},${q.tauE}])",
        coreR.tspg.edgeCount.toString,
        f"${BenchUtil.ms(distR.timings.quickNanos)}%.0f",
        f"${BenchUtil.ms(distR.timings.tightNanos)}%.0f",
        f"${BenchUtil.ms(distR.timings.eevNanos)}%.0f",
        f"${BenchUtil.ms(distN)}%.0f",
        f"${BenchUtil.ms(coreN)}%.0f")
    }
    BenchUtil.table("Distributed VUG pipeline on R5 (times in ms)",
      Seq("query", "|E(tspG)|", "distQuick", "distTight", "EEV(collected)",
        "dist total", "core total"), rows)
    edges.unpersist()
  }
}

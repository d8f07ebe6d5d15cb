package repro.bench

import repro.SparkSpec
import repro.core.Vug
import repro.data.Datasets

/** Reproduces Fig. 10 / Fig. 15 (Exp-5, θ impact) as a table: per-θ upper-bound ratio
  * of QuickUBG and TightUBG plus their time overhead, on the two largest datasets
  * (R9 ~ D9, R10 ~ D10).
  *
  * Shape target: ratios stay high and drift slowly with θ; QuickUBG/TightUBG time
  * stays stable (paper: D9 θ 16→24 moves TightUBG's ratio 98.5%→91.6% while VUG's
  * time only doubles).
  */
class Exp5ThetaRatioBench extends SparkSpec {

  private val nq = math.max(5, BenchUtil.nQueries / 2)

  private def sweep(datasetId: String, thetas: Seq[Int]): Unit = {
    val spec = Datasets.byId(datasetId)
    val g    = BenchData.graph(spec)
    val rows = thetas.map { th =>
      val qs = BenchData.queries(spec, nq, theta = th)
      var quickN = 0L
      var tightN = 0L
      var quickRatio = 0.0
      var tightRatio = 0.0
      qs.foreach { q =>
        val r = Vug.run(g, q)
        quickN += r.timings.quickNanos
        tightN += r.timings.tightNanos
        quickRatio += 100.0 * r.tspg.edgeCount / math.max(1, r.gq.m)
        tightRatio += 100.0 * r.tspg.edgeCount / math.max(1, r.gt.m)
      }
      Seq(th.toString,
        f"${quickRatio / qs.size}%.1f", f"${tightRatio / qs.size}%.1f",
        f"${BenchUtil.ms(quickN)}%.1f", f"${BenchUtil.ms(tightN)}%.1f")
    }
    BenchUtil.table(
      s"Exp-5 -- upper-bound ratio & time vs theta on ${spec.id} (${spec.paperId}), $nq queries",
      Seq("theta", "Quick ratio %", "Tight ratio %", "Quick ms", "Tight ms"), rows)
    rows.foreach { r =>
      assert(r(1).toDouble <= r(2).toDouble + 1e-9, s"Tight not tighter than Quick: $r")
    }
  }

  test("Exp-5: theta impact on R9") { sweep("R9", Seq(16, 20, 24)) }
  test("Exp-5: theta impact on R10") { sweep("R10", Seq(21, 23, 25, 27)) }
}

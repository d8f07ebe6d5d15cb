package repro.bench

import repro.SparkSpec
import repro.core.{Baselines, Vug}
import repro.data.Datasets

/** Reproduces Fig. 6 / Fig. 14 (Exp-2) as a table: total response time vs θ, on the
  * small dense dataset (R1 ~ D1) and the large dataset (R9 ~ D9).
  *
  * Shape target: baseline time grows (near-)exponentially with θ while VUG grows
  * modestly (paper: θ 8→12 on D1 multiplies the baselines by 165–320× but VUG by 3×).
  */
class Exp2ThetaSweepBench extends SparkSpec {

  private val capNs = BenchUtil.capMs * 1000000L
  private val nq    = math.max(5, BenchUtil.nQueries / 2)

  private def sweep(datasetId: String, thetas: Seq[Int]): Unit = {
    val spec = Datasets.byId(datasetId)
    val g    = BenchData.graph(spec)
    val rows = thetas.map { th =>
      val qs = BenchData.queries(spec, nq, theta = th)
      val (_, vugN) = BenchUtil.timed(qs.foreach(q => Vug.tspg(g, q)))
      var dtN = 0L; var dtC = 0
      var esN = 0L; var esC = 0
      var tgN = 0L; var tgC = 0
      qs.foreach { q =>
        val (r1, d1) = BenchUtil.timed(Baselines.epDtTsg(g, q, Long.MaxValue, capNs))
        dtN += d1; if (!r1.complete) dtC += 1
        val (r2, d2) = BenchUtil.timed(Baselines.epEsTsg(g, q, Long.MaxValue, capNs))
        esN += d2; if (!r2.complete) esC += 1
        val (r3, d3) = BenchUtil.timed(Baselines.epTgTsg(g, q, Long.MaxValue, capNs))
        tgN += d3; if (!r3.complete) tgC += 1
      }
      def cell(n: Long, c: Int) = f"${BenchUtil.ms(n)}%.0f" + (if (c > 0) s" (cap $c)" else "")
      Seq(th.toString, cell(dtN, dtC), cell(esN, esC), cell(tgN, tgC),
        f"${BenchUtil.ms(vugN)}%.0f")
    }
    BenchUtil.table(
      s"Exp-2 -- response time vs theta on ${spec.id} (${spec.paperId}), $nq queries, " +
        s"cap ${BenchUtil.capMs} ms",
      Seq("theta", "EPdtTSG", "EPesTSG", "EPtgTSG", "VUG"), rows)
  }

  test("Exp-2: response time by varying theta on R1") {
    sweep("R1", Seq(6, 8, 10, 12))
  }

  test("Exp-2: response time by varying theta on R9") {
    sweep("R9", Seq(16, 20, 24))
  }
}

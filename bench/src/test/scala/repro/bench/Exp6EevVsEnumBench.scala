package repro.bench

import repro.SparkSpec
import repro.core.{Eev, PathEnum, QuickUbg, TightUbg}
import repro.data.Datasets

/** Reproduces Fig. 11 / Fig. 16 (Exp-6) as a table: with the same tight upper-bound
  * graph `Gt` as input, time to produce the exact tspG by Escaped Edges Verification
  * vs by exhaustive path enumeration, on R1 (~D1) and R8 (~D8) across θ.
  *
  * Shape target: EEV is faster -- by growing margins as θ (and hence the path count)
  * grows (paper: D8 θ=12, 796 s enumeration vs 44 s EEV).
  */
class Exp6EevVsEnumBench extends SparkSpec {

  private val capNs = 4L * BenchUtil.capMs * 1000000L
  private val nq    = math.max(5, BenchUtil.nQueries / 2)

  private def sweep(datasetId: String, thetas: Seq[Int]): Unit = {
    val spec = Datasets.byId(datasetId)
    val g    = BenchData.graph(spec)
    val rows = thetas.map { th =>
      val qs  = BenchData.queries(spec, nq, theta = th)
      var eevN  = 0L
      var enumN = 0L
      var cap   = 0
      qs.foreach { q =>
        val gt = TightUbg.compute(QuickUbg.compute(g, q), q)
        val (eevR, d1)  = BenchUtil.timed(Eev(gt, q))
        val (enumR, d2) = BenchUtil.timed(PathEnum.run(gt, q, Long.MaxValue, capNs))
        eevN += d1; enumN += d2
        if (!enumR.complete) cap += 1
        else assert(eevR == enumR.subgraph, s"EEV != enumeration on ${spec.id} $q")
      }
      Seq(th.toString, f"${BenchUtil.ms(enumN)}%.1f" + (if (cap > 0) s" (cap $cap)" else ""),
        f"${BenchUtil.ms(eevN)}%.1f", f"${enumN.toDouble / math.max(1L, eevN)}%.1fx")
    }
    BenchUtil.table(
      s"Exp-6 -- EEV vs enumeration on Gt, ${spec.id} (${spec.paperId}), $nq queries, " +
        s"enum cap ${4 * BenchUtil.capMs} ms",
      Seq("theta", "enumeration", "EEV", "enum/EEV"), rows)
  }

  test("Exp-6: EEV vs path enumeration on R1") { sweep("R1", Seq(8, 10, 12)) }
  test("Exp-6: EEV vs path enumeration on R8") { sweep("R8", Seq(8, 10, 12)) }
}

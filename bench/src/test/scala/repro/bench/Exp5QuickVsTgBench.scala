package repro.bench

import repro.SparkSpec
import repro.core.{Baselines, QuickUbg}

/** Reproduces Fig. 9 (Exp-5) as a table: response time of the Dijkstra-based tgTSG
  * reduction vs the BFS-based QuickUBG, which produce the same graph but differ by a
  * priority-queue log-factor (paper: up to two orders of magnitude; D7 2.4 h vs 32 s).
  */
class Exp5QuickVsTgBench extends SparkSpec {

  test("Exp-5: response time of tgTSG vs QuickUBG") {
    var totTg = 0L
    var totQ  = 0L
    val rows = BenchUtil.datasets.map { spec =>
      val g  = BenchData.graph(spec)
      val qs = BenchData.queries(spec, BenchUtil.nQueries)
      var tgN = 0L
      var qN  = 0L
      qs.foreach { q =>
        val (tg, d1) = BenchUtil.timed(Baselines.tgTsg(g, q))
        val (qg, d2) = BenchUtil.timed(QuickUbg.compute(g, q))
        tgN += d1; qN += d2
        assert(tg.edgeSet == qg.edgeSet, s"tgTSG != QuickUBG on ${spec.id} $q")
      }
      totTg += tgN; totQ += qN
      Seq(spec.id, f"${BenchUtil.ms(tgN)}%.1f", f"${BenchUtil.ms(qN)}%.1f",
        f"${tgN.toDouble / math.max(1L, qN)}%.1fx")
    }
    BenchUtil.table(
      s"Exp-5 -- tgTSG vs QuickUBG time (ms), ${BenchUtil.nQueries} queries/dataset",
      Seq("id", "tgTSG", "QuickUBG", "tg/Quick"), rows)
    // Shape: identical graphs, QuickUBG faster in aggregate.
    assert(totQ < totTg, s"QuickUBG not faster overall: quick=$totQ tg=$totTg")
  }
}

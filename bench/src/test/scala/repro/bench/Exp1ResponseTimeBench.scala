package repro.bench

import repro.SparkSpec
import repro.core.{Baselines, EnumResult, TemporalGraph, TspgQuery, Vug}

/** Reproduces Fig. 5 (Exp-1) as a table: total response time of EPdtTSG / EPesTSG /
  * EPtgTSG / VUG per dataset at the default θ.
  *
  * Enumeration baselines get a per-query wall-clock cap (`REPRO_BENCH_CAP_MS`,
  * default 300 ms) modelling the paper's 12-hour INF cutoff; `capped` counts the
  * queries that hit it (the paper's D8/D9 "INF" rows correspond to capped > 0 here).
  * Shape target: VUG beats every baseline, by growing factors on the dense datasets.
  */
class Exp1ResponseTimeBench extends SparkSpec {

  private val capNs = BenchUtil.capMs * 1000000L

  private def runEp(name: String, ep: (TemporalGraph, TspgQuery, Long, Long) => EnumResult,
                    g: TemporalGraph, qs: Seq[TspgQuery]): (Long, Int, Boolean) = {
    var nanos  = 0L
    var capped = 0
    var exact  = true
    qs.foreach { q =>
      val (r, dt) = BenchUtil.timed(ep(g, q, Long.MaxValue, capNs))
      nanos += dt
      if (!r.complete) { capped += 1; exact = false }
    }
    (nanos, capped, exact)
  }

  test("Exp-1: total response time on all datasets") {
    var totVug  = 0L
    var totBest = 0L
    val rows = BenchUtil.datasets.map { spec =>
      val g  = BenchData.graph(spec)
      val qs = BenchData.queries(spec, BenchUtil.nQueries)

      val (_, vugNanos)   = BenchUtil.timed(qs.foreach(q => Vug.tspg(g, q)))
      val (dtN, dtCap, _) = runEp("EPdtTSG", Baselines.epDtTsg, g, qs)
      val (esN, esCap, _) = runEp("EPesTSG", Baselines.epEsTsg, g, qs)
      val (tgN, tgCap, _) = runEp("EPtgTSG", Baselines.epTgTsg, g, qs)
      totVug += vugNanos
      totBest += dtN.min(esN).min(tgN)

      def cell(n: Long, cap: Int): String =
        f"${BenchUtil.ms(n)}%.0f" + (if (cap > 0) s" (cap $cap)" else "")

      Seq(spec.id, cell(dtN, dtCap), cell(esN, esCap), cell(tgN, tgCap),
        f"${BenchUtil.ms(vugNanos)}%.0f",
        f"${(dtN.min(esN).min(tgN)).toDouble / math.max(1L, vugNanos)}%.1fx")
    }
    BenchUtil.table(
      s"Exp-1 -- total response time (ms), ${BenchUtil.nQueries} queries/dataset, " +
        s"baseline cap ${BenchUtil.capMs} ms/query",
      Seq("id", "EPdtTSG", "EPesTSG", "EPtgTSG", "VUG", "bestEP/VUG"), rows)
    // Shape: summed over the benchmark, VUG beats the best baseline (the paper's
    // headline claim); note the baselines are additionally *capped*, so their true
    // totals are lower bounds.
    assert(totVug < totBest,
      f"VUG total ${BenchUtil.ms(totVug)}%.0f ms not below best-EP total ${BenchUtil.ms(totBest)}%.0f ms")
  }
}

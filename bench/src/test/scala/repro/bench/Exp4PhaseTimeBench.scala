package repro.bench

import repro.SparkSpec
import repro.core.{Vug, VugTimings}

/** Reproduces Fig. 8 (Exp-4) as a table: total per-phase response time of VUG
  * (QuickUBG / TightUBG / EEV) per dataset.
  *
  * Shape target: EEV -- despite its exponential worst case -- is a small fraction of
  * the total on most datasets (paper: 0.04% of D10's total).
  */
class Exp4PhaseTimeBench extends SparkSpec {

  test("Exp-4: response time of each phase in VUG") {
    val rows = BenchUtil.datasets.map { spec =>
      val g  = BenchData.graph(spec)
      val qs = BenchData.queries(spec, BenchUtil.nQueries)
      val total = qs.foldLeft(VugTimings.zero)((acc, q) => acc + Vug.run(g, q).timings)
      val eevPct = 100.0 * total.eevNanos / math.max(1L, total.totalNanos)
      Seq(spec.id,
        f"${BenchUtil.ms(total.quickNanos)}%.1f",
        f"${BenchUtil.ms(total.tightNanos)}%.1f",
        f"${BenchUtil.ms(total.eevNanos)}%.1f",
        f"$eevPct%.1f%%")
    }
    BenchUtil.table(
      s"Exp-4 -- VUG per-phase time (ms), ${BenchUtil.nQueries} queries/dataset",
      Seq("id", "QuickUBG", "TightUBG", "EEV", "EEV share"), rows)
    // Shape: the exact-verification phase stays a minority of the pipeline overall.
    val eevShares = rows.map(_.last.dropRight(1).toDouble)
    assert(eevShares.count(_ < 50.0) >= rows.size / 2,
      s"EEV dominates on most datasets: $eevShares")
  }
}

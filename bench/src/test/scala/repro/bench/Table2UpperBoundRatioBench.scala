package repro.bench

import repro.SparkSpec
import repro.core.{Baselines, Vug}

/** Reproduces paper TABLE II: the average upper-bound ratio
  * `|E(tspG)| / |E(upper-bound graph)| · 100` for dtTSG / esTSG / tgTSG / QuickUBG /
  * TightUBG over random satisfiable queries at the default θ per dataset.
  *
  * Shape target (paper): dt ≪ es ≤ tg = Quick < Tight, with TightUBG above 70% on
  * every dataset and above 90% on most.
  */
class Table2UpperBoundRatioBench extends SparkSpec {

  test("TABLE II: average upper-bound ratio (%)") {
    val rows = BenchUtil.datasets.map { spec =>
      val g  = BenchData.graph(spec)
      val qs = BenchData.queries(spec, BenchUtil.nQueries)
      val sums = Array.fill(5)(0.0)
      qs.foreach { q =>
        val r     = Vug.run(g, q)
        val tspgE = r.tspg.edgeCount.toDouble
        val sizes = Array(
          Baselines.dtTsg(g, q).m, Baselines.esTsg(g, q).m, Baselines.tgTsg(g, q).m,
          r.gq.m, r.gt.m)
        sizes.indices.foreach(i => sums(i) += 100.0 * tspgE / math.max(1, sizes(i)))
        // Sanity inside the measurement loop: tgTSG and QuickUBG are the same graph.
        assert(sizes(2) == sizes(3), s"tgTSG != QuickUBG on ${spec.id} $q")
      }
      val avg = sums.map(v => f"${v / qs.size}%.1f")
      Seq(spec.id) ++ avg
    }
    BenchUtil.table(
      s"TABLE II -- average upper-bound ratio (%), ${BenchUtil.nQueries} queries/dataset",
      Seq("id", "dtTSG", "esTSG", "tgTSG", "QuickUBG", "TightUBG"), rows)
    // Shape assertions: the chain must hold on averages for every dataset.
    rows.foreach { r =>
      val Seq(dt, es, tg, quick, tight) = r.drop(1).map(_.toDouble)
      assert(dt <= es + 1e-9 && es <= tg + 1e-9 && tg == quick && quick <= tight + 1e-9,
        s"ratio ordering violated: $r")
    }
  }
}

package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Baselines, Vug}
import repro.data.{Datasets, Workload}

/** spark-submit entrypoint regenerating the paper's TABLE II (average upper-bound
  * ratio %, i.e. `|E(tspG)| / |E(ubg)| · 100`, for dtTSG / esTSG / tgTSG / QuickUBG /
  * TightUBG).
  *
  * Usage: `spark-submit --class repro.jobs.Table2Job <jar> [nQueries] [datasetId ...]`
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("tspg-table2").getOrCreate()
    try {
      val nq    = args.headOption.map(_.toInt).getOrElse(30)
      val specs = if (args.length > 1) args.drop(1).toIndexedSeq.map(Datasets.byId) else Datasets.all
      println(f"${"id"}%-4s ${"dtTSG"}%8s ${"esTSG"}%8s ${"tgTSG"}%8s ${"QuickUBG"}%9s ${"TightUBG"}%9s")
      specs.foreach { spec =>
        val g       = spec.generateCore(spark)
        val queries = Workload.queries(g, spec.theta, nq, seed = spec.seed * 31)
        val sums    = Array.fill(5)(0.0)
        queries.foreach { q =>
          val r     = Vug.run(g, q)
          val tspgE = r.tspg.edgeCount.toDouble
          val ubgs  = Array(
            Baselines.dtTsg(g, q).m, Baselines.esTsg(g, q).m, Baselines.tgTsg(g, q).m,
            r.gq.m, r.gt.m)
          ubgs.zipWithIndex.foreach { case (m, i) => sums(i) += 100.0 * tspgE / math.max(1, m) }
        }
        val avg = sums.map(_ / queries.size)
        println(f"${spec.id}%-4s ${avg(0)}%8.1f ${avg(1)}%8.1f ${avg(2)}%8.1f ${avg(3)}%9.1f ${avg(4)}%9.1f")
      }
    } finally spark.stop()
  }
}

package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.Datasets

/** spark-submit entrypoint regenerating the paper's TABLE I (dataset statistics) for
  * the synthetic analogues R1..R10, printing paper numbers alongside.
  *
  * Usage: `spark-submit --class repro.jobs.Table1Job <jar> [datasetId ...]`
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("tspg-table1").getOrCreate()
    try {
      val specs = if (args.isEmpty) Datasets.all else args.toIndexedSeq.map(Datasets.byId)
      println(f"${"id"}%-4s ${"paper"}%-22s ${"|V|"}%10s ${"|E|"}%12s ${"|T|"}%8s ${"d"}%8s ${"theta"}%6s")
      specs.foreach { spec =>
        val g = spec.generateCore(spark)
        println(f"${spec.id}%-4s ${spec.paperId}%-22s ${g.vertices.size}%10d ${g.m}%12d " +
          f"${g.timestamps.length}%8d ${g.maxDegree}%8d ${spec.theta}%6d")
        println(f"${""}%-4s ${"(paper)"}%-22s ${spec.paper.nV}%10d ${spec.paper.nE}%12d " +
          f"${spec.paper.nT}%8d ${spec.paper.d}%8d ${spec.paper.theta}%6d")
      }
    } finally spark.stop()
  }
}

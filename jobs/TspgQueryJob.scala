package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.TspgQuery
import repro.data.Datasets
import repro.dist.DistVug

/** spark-submit entrypoint running one temporal simple path graph query end-to-end
  * through the distributed VUG pipeline and printing the resulting subgraph.
  *
  * Usage: `spark-submit --class repro.jobs.TspgQueryJob <jar> <datasetId> <s> <t> <tauB> <tauE>`
  */
object TspgQueryJob {
  def main(args: Array[String]): Unit = {
    require(args.length == 5, "args: <datasetId> <s> <t> <tauB> <tauE>")
    val spark = SparkSession.builder.appName("tspg-query").getOrCreate()
    try {
      val spec  = Datasets.byId(args(0))
      val q     = TspgQuery(args(1).toInt, args(2).toInt, args(3).toInt, args(4).toInt)
      val edges = spec.generate(spark)
      val res   = DistVug.run(spark, edges, q)
      println(s"query=$q  |E(Gq)|=${res.gq.count()}  |E(Gt)|=${res.gt.count()}  " +
        s"|V(tspG)|=${res.tspg.vertexCount}  |E(tspG)|=${res.tspg.edgeCount}")
      res.tspgEdges.orderBy("ts", "src", "dst").show(1000, truncate = false)
    } finally spark.stop()
  }
}

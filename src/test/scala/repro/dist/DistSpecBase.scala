package repro.dist

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.TemporalGraph

/** Base for the dataflow-layer suites: tiny shuffle fan-out (the inputs are small and
  * the iterative jobs are latency-bound) plus conversion helpers.
  */
trait DistSpecBase extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "4")
  }

  def df(g: TemporalGraph): DataFrame = GraphDF.fromCore(spark, g)

  /** Collect a `(v, label)` table into a map. */
  def labelMap(d: DataFrame): Map[Int, Int] =
    d.collect().map(r => r.getLong(0).toInt -> r.getLong(1).toInt).toMap
}

package repro.dist

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.{TEdge, TemporalGraph}

/** Edge-table representation of a temporal graph for the dataflow layer.
  *
  * Canonical schema: `src: long, dst: long, ts: long`. The DataFrame is edge-set
  * valued (distinct triples, no self-loops) — [[canon]] enforces this so the dist
  * algorithms can assume it, mirroring [[repro.core.TemporalGraph]] construction.
  */
object GraphDF {

  val schema: StructType = StructType(Seq(
    StructField("src", LongType, nullable = false),
    StructField("dst", LongType, nullable = false),
    StructField("ts", LongType, nullable = false),
  ))

  /** Project to the canonical schema, drop self-loops, and de-duplicate. */
  def canon(edges: DataFrame): DataFrame =
    edges
      .select(col("src").cast(LongType), col("dst").cast(LongType), col("ts").cast(LongType))
      .where(col("src") =!= col("dst"))
      .distinct()

  def fromCore(spark: SparkSession, g: TemporalGraph): DataFrame = {
    val rows = g.edges.toIndexedSeq.map(e => Row(e.src.toLong, e.dst.toLong, e.ts.toLong))
    spark.createDataFrame(spark.sparkContext.parallelize(rows), schema)
  }

  /** Collect an edge table into a core graph (`n` inferred unless given). */
  def toCore(edges: DataFrame, n: Int = -1): TemporalGraph = {
    val es = canon(edges).collect().map { r =>
      TEdge(r.getLong(0).toInt, r.getLong(1).toInt, r.getLong(2).toInt)
    }
    if (n >= 0) TemporalGraph(n, es) else TemporalGraph.ofEdges(es)
  }

  /** Edge set of a (small) edge table, for assertions. */
  def toEdgeSet(edges: DataFrame): Set[TEdge] =
    canon(edges).collect().map { r =>
      TEdge(r.getLong(0).toInt, r.getLong(1).toInt, r.getLong(2).toInt)
    }.toSet
}

package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Eev, Subgraph, TemporalGraph, TspgQuery}

/** Per-phase wall-clock timings of one distributed VUG run, nanoseconds. */
final case class DistVugTimings(quickNanos: Long, tightNanos: Long, eevNanos: Long)

/** Result of the distributed pipeline: exact tspG edge table + both upper-bound
  * graphs (as edge tables) + phase timings.
  */
final case class DistVugResult(
    tspgEdges: DataFrame,
    tspg: Subgraph,
    gq: DataFrame,
    gt: DataFrame,
    timings: DistVugTimings,
)

/** The full VUG pipeline (paper Algorithm 1) over Spark dataflow.
  *
  * The polynomial pruning phases run as DataFrame programs over the (possibly large)
  * input edge table. `Gt` is by construction a tight approximation of tspG (paper
  * Table II: ratio > 90% on 8/10 datasets), so the exact Escaped-Edges-Verification
  * finishes on the *collected* `Gt` at the driver — the standard collapse-then-finish
  * pattern for distributed s-t path queries. `DistEnum.tspgEdges(gt)` is the fully
  * distributed (but enumeration-based) alternative, cross-checked in tests.
  */
object DistVug {

  def run(spark: SparkSession, edges: DataFrame, q: TspgQuery): DistVugResult = {
    val t0 = System.nanoTime()
    val gq = DistQuickUbg.compute(spark, edges, q).localCheckpoint()
    val t1 = System.nanoTime()
    val gt = DistTightUbg.compute(spark, gq, q).localCheckpoint()
    val t2 = System.nanoTime()
    // Preserve the vertex-id universe: Gt may be tiny (or empty) while s/t and other
    // ids remain large, and the core algorithms index arrays by vertex id.
    val gtEdges = GraphDF.toEdgeSet(gt)
    val maxId   = (gtEdges.iterator.flatMap(e => Iterator(e.src, e.dst)) ++ Iterator(q.s, q.t)).max
    val coreGt  = TemporalGraph(maxId + 1, gtEdges)
    val tspg    = Eev(coreGt, q)
    val t3 = System.nanoTime()
    val outDf = GraphDF.fromCore(spark, TemporalGraph.ofEdges(tspg.edges))
    DistVugResult(outDf, tspg, gq, gt, DistVugTimings(t1 - t0, t2 - t1, t3 - t2))
  }
}

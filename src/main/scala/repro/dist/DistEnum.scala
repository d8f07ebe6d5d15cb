package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TspgQuery

/** Distributed temporal simple path enumeration — the dataflow analogue of the EP
  * baselines' enumeration stage (and of Exp-6's "path enumeration on Gt").
  *
  * A frontier of partial paths `(cur, lastTs, visited: array<long>, path: array<edge>)`
  * is extended each round by joining with the edge table under the strict-ascent and
  * simplicity predicates; rows reaching `t` retire into the answer (simple paths end at
  * `t` — extending past it could only revisit it). At most `θ` rounds (Remark 1).
  *
  * The frontier cardinality is the number of partial simple paths — exponential in the
  * worst case, exactly like the sequential enumeration it mirrors. Use on pruned
  * upper-bound graphs or small inputs.
  */
object DistEnum {

  /** Distinct edges of all temporal simple paths `s ⇝ t` within the window. */
  def tspgEdges(spark: SparkSession, edges: DataFrame, q: TspgQuery): DataFrame = {
    import spark.implicits._
    val e = GraphDF.canon(edges)
      .where($"ts" >= q.tauB && $"ts" <= q.tauE)
      .select($"src", $"dst", $"ts")
      .cache()

    val edgeStruct = struct($"src".as("esrc"), $"dst".as("edst"), $"ts".as("ets"))
    var frontier = e.where($"src" === q.s.toLong)
      .select(
        $"dst".as("cur"),
        $"ts".as("lastTs"),
        array($"src", $"dst").as("visited"),
        array(edgeStruct).as("path"))
      .localCheckpoint()
    var done = frontier.where(lit(false)).select($"path") // empty, right schema

    var round = 0
    while (round < q.theta && !frontier.isEmpty) {
      done = done.unionByName(frontier.where($"cur" === q.t.toLong).select($"path"))
        .localCheckpoint()
      val active = frontier.where($"cur" =!= q.t.toLong)
      frontier = active
        .join(e, active("cur") === e("src") && e("ts") > active("lastTs"))
        .where(!array_contains($"visited", e("dst")))
        .select(
          e("dst").as("cur"),
          e("ts").as("lastTs"),
          concat($"visited", array(e("dst"))).as("visited"),
          concat($"path", array(edgeStruct)).as("path"))
        .localCheckpoint()
      round += 1
    }
    // Paths that reached t in the final round are still sitting in the frontier.
    done = done.unionByName(frontier.where($"cur" === q.t.toLong).select($"path"))
    e.unpersist()
    done
      .select(explode($"path").as("pe"))
      .select($"pe.esrc".as("src"), $"pe.edst".as("dst"), $"pe.ets".as("ts"))
      .distinct()
  }
}

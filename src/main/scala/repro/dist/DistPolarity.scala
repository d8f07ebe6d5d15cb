package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TspgQuery

/** Polarity times (paper Algorithm 3) as iterative DataFrame relaxation.
  *
  * Each round joins the frontier (vertices whose label improved last round) with the
  * edge table, aggregates candidate labels (`min` for arrivals, `max` for departures),
  * and merges improvements into the label table. Because timestamps strictly ascend
  * along a temporal path and a path has at most `θ` edges (Remark 1), the fixpoint is
  * reached within `θ` rounds. `localCheckpoint` caps lineage per round.
  *
  * Output tables: `arrivals` = `(v: long, arr: long)` including `(s, τb−1)` — absent
  * vertices have `A = +∞`; `departures` = `(v: long, dep: long)` including
  * `(t, τe+1)` — absent vertices have `D = −∞`.
  */
object DistPolarity {

  /** Earliest strict-ascending arrival from `s` within the window, avoiding `t`. */
  def arrivals(spark: SparkSession, edges: DataFrame, q: TspgQuery): DataFrame = {
    import spark.implicits._
    // The traversal never enters t (Algorithm 3 line 6): drop edges into t up front.
    val e = GraphDF.canon(edges)
      .where($"ts" >= q.tauB && $"ts" <= q.tauE && $"dst" =!= q.t.toLong)
      .cache()
    var labels   = Seq((q.s.toLong, (q.tauB - 1).toLong)).toDF("v", "arr").localCheckpoint()
    var frontier = labels
    var rounds   = 0
    while (rounds <= q.theta && !frontier.isEmpty) {
      val cand = frontier
        .join(e, frontier("v") === e("src") && e("ts") > frontier("arr"))
        .groupBy(e("dst").as("cv"))
        .agg(min(e("ts")).as("cand"))
      val improved = cand
        .join(labels, cand("cv") === labels("v"), "left")
        .where($"arr".isNull || $"cand" < $"arr")
        .select($"cv".as("v"), $"cand".as("arr"))
        .localCheckpoint()
      labels = labels.as("l")
        .join(improved.as("i"), $"l.v" === $"i.v", "full_outer")
        .select(
          coalesce($"l.v", $"i.v").as("v"),
          least(coalesce($"l.arr", $"i.arr"), coalesce($"i.arr", $"l.arr")).as("arr"))
        .localCheckpoint()
      // Algorithm 3 line 9: a vertex reached exactly at τe cannot relax further.
      frontier = improved.where($"arr" =!= q.tauE.toLong)
      rounds += 1
    }
    e.unpersist()
    labels
  }

  /** Latest strict-ascending departure towards `t` within the window, avoiding `s`. */
  def departures(spark: SparkSession, edges: DataFrame, q: TspgQuery): DataFrame = {
    import spark.implicits._
    val e = GraphDF.canon(edges)
      .where($"ts" >= q.tauB && $"ts" <= q.tauE && $"src" =!= q.s.toLong)
      .cache()
    var labels   = Seq((q.t.toLong, (q.tauE + 1).toLong)).toDF("v", "dep").localCheckpoint()
    var frontier = labels
    var rounds   = 0
    while (rounds <= q.theta && !frontier.isEmpty) {
      val cand = frontier
        .join(e, frontier("v") === e("dst") && e("ts") < frontier("dep"))
        .groupBy(e("src").as("cv"))
        .agg(max(e("ts")).as("cand"))
      val improved = cand
        .join(labels, cand("cv") === labels("v"), "left")
        .where($"dep".isNull || $"cand" > $"dep")
        .select($"cv".as("v"), $"cand".as("dep"))
        .localCheckpoint()
      labels = labels.as("l")
        .join(improved.as("i"), $"l.v" === $"i.v", "full_outer")
        .select(
          coalesce($"l.v", $"i.v").as("v"),
          greatest(coalesce($"l.dep", $"i.dep"), coalesce($"i.dep", $"l.dep")).as("dep"))
        .localCheckpoint()
      frontier = improved.where($"dep" =!= q.tauB.toLong)
      rounds += 1
    }
    e.unpersist()
    labels
  }
}

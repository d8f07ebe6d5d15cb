package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.TspgQuery

/** Time-stream common vertices (paper Algorithm 4) as a relational timestamp sweep.
  *
  * The recursion of Eqs. 3–4 is a dependency chain in `(vertex, timestamp)` space in
  * which timestamps strictly increase (forward) / decrease (backward), so sweeping the
  * ≤ θ distinct window timestamps in order makes every step a pure join: for step `τ`,
  * each in-edge `e(v, u, τ)` contributes the candidate set `TCV_{τ−1}(s, v) ∪ {u}`
  * (looked up as `v`'s most recent entry — all prior entries have ts < τ, so Lemma 5
  * gives exactly `TCV_{τ−1}`), and the intersection across contributors (plus `u`'s own
  * previous entry, which carries the running intersection) is expressed relationally:
  * explode every candidate set and keep the vertices `w` whose `(u, w)` count equals
  * the number of contributing sets.
  *
  * Entries never reported: vertices with no qualifying walk (candidate `null`), and
  * the anchors `s` / `t` themselves. Lemma 7 pruning is skipped — post-completion
  * entries just stay `{u}`, so lookups agree with the pruned core index (asserted by
  * the dist test suites via `Gt` equality).
  *
  * Output: `(u: long, ets: long, tcv: array<long>)` — one row per (vertex, entry ts).
  */
object DistTcv {

  val entrySchema: StructType = StructType(Seq(
    StructField("u", LongType, nullable = false),
    StructField("ets", LongType, nullable = false),
    StructField("tcv", ArrayType(LongType, containsNull = false), nullable = false),
  ))

  /** Forward entries `TCV_·(s, ·)` at in-timestamps. */
  def forward(spark: SparkSession, gq: DataFrame, q: TspgQuery): DataFrame =
    sweep(spark, gq, q, isForward = true)

  /** Backward entries `TCV_·(·, t)` at out-timestamps. */
  def backward(spark: SparkSession, gq: DataFrame, q: TspgQuery): DataFrame =
    sweep(spark, gq, q, isForward = false)

  private def sweep(spark: SparkSession, gqRaw: DataFrame, q: TspgQuery,
                    isForward: Boolean): DataFrame = {
    import spark.implicits._
    val gq = GraphDF.canon(gqRaw).cache()
    // The entry owner is the head (forward) / tail (backward) of each edge; the
    // provider is the other endpoint, whose previous entry feeds the candidate set.
    val anchor   = (if (isForward) q.s else q.t).toLong // base case: empty TCV
    val excluded = (if (isForward) q.t else q.s).toLong // walks must avoid this vertex
    val tsAsc    = gq.select($"ts").distinct().as[Long].collect().sorted
    val tsOrder  = if (isForward) tsAsc else tsAsc.reverse

    var entries = spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row], entrySchema)
    for (tau <- tsOrder) {
      val step = gq.where($"ts" === tau)
        .select(
          (if (isForward) $"src" else $"dst").as("prov"),
          (if (isForward) $"dst" else $"src").as("eu"))
        .where($"eu" =!= anchor && $"eu" =!= excluded && $"prov" =!= excluded)
      // Snapshot of each vertex's most recent entry (strictly before this step).
      val rnOrder = if (isForward) $"ets".desc else $"ets".asc
      val lastPer = entries
        .withColumn("rn", row_number().over(Window.partitionBy($"u").orderBy(rnOrder)))
        .where($"rn" === 1)
        .select($"u".as("lv"), $"tcv".as("ltcv"))
      val cand = step
        .join(lastPer, $"prov" === $"lv", "left")
        .withColumn("candSet",
          when($"prov" === anchor, array($"eu"))
            .otherwise(when($"ltcv".isNotNull, array_union($"ltcv", array($"eu")))))
        .where($"candSet".isNotNull)
        .select($"eu", $"candSet")
      val prevOfU = cand.select($"eu").distinct()
        .join(lastPer, $"eu" === $"lv")
        .select($"eu", $"ltcv".as("prevSet"))
      val exploded = cand.select($"eu", explode($"candSet").as("w"))
        .unionByName(prevOfU.select($"eu", explode($"prevSet").as("w")))
      val totals = cand.groupBy($"eu").agg(count(lit(1)).as("nc"))
        .join(prevOfU.select($"eu".as("pu"), lit(1L).as("hp")), $"eu" === $"pu", "left")
        .select($"eu".as("tu"), ($"nc" + coalesce($"hp", lit(0L))).as("total"))
      val newEntries = exploded.groupBy($"eu", $"w").agg(count(lit(1)).as("c"))
        .join(totals, $"eu" === $"tu")
        .where($"c" === $"total")
        .groupBy($"eu").agg(sort_array(collect_set($"w")).as("tcv"))
        .select($"eu".as("u"), lit(tau).as("ets"), $"tcv")
      entries = entries.unionByName(newEntries).localCheckpoint()
    }
    gq.unpersist()
    entries
  }
}

package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.TspgQuery

/** Tight upper-bound graph (paper Algorithm 5 / Lemma 9) as a dataflow program.
  *
  * For every `Gq` edge `e(u, v, τ)` with `u ≠ s, v ≠ t`, join the forward TCV entries
  * of `u` restricted to `ets < τ` and pick the latest (that is `TCV_{τl}(s, u)`), join
  * the backward entries of `v` restricted to `ets > τ` and pick the earliest
  * (`TCV_{τr}(v, t)`), and keep the edge iff both exist and `array_intersect` is empty
  * (Lemma 8 reduces all `(τi, τj)` combinations to this single pair). Edges out of `s`
  * or into `t` bypass the check (Lemma 2).
  */
object DistTightUbg {

  def apply(spark: SparkSession, gqRaw: DataFrame, q: TspgQuery,
            fwdEntries: DataFrame, bwdEntries: DataFrame): DataFrame = {
    import spark.implicits._
    val gq     = GraphDF.canon(gqRaw)
    val direct = gq.where($"src" === q.s.toLong || $"dst" === q.t.toLong)
    val rest   = gq.where($"src" =!= q.s.toLong && $"dst" =!= q.t.toLong)

    val fwd = fwdEntries.select($"u".as("fu"), $"ets".as("fts"), $"tcv".as("fset"))
    val bwd = bwdEntries.select($"u".as("bu"), $"ets".as("bts"), $"tcv".as("bset"))

    val edgeKey = Seq("src", "dst", "ts")
    val withF = rest
      .join(fwd, rest("src") === $"fu" && $"fts" < rest("ts")) // inner: no entry ⇒ drop
      .withColumn("rn", row_number().over(
        Window.partitionBy(edgeKey.map(col): _*).orderBy($"fts".desc)))
      .where($"rn" === 1)
      .select($"src", $"dst", $"ts", $"fset")
    val withFB = withF
      .join(bwd, withF("dst") === $"bu" && $"bts" > withF("ts"))
      .withColumn("rn", row_number().over(
        Window.partitionBy(edgeKey.map(col): _*).orderBy($"bts".asc)))
      .where($"rn" === 1)
      .select($"src", $"dst", $"ts", $"fset", $"bset")

    val kept = withFB
      .where(size(array_intersect($"fset", $"bset")) === 0)
      .select($"src", $"dst", $"ts")
    direct.unionByName(kept)
  }

  /** `Gt` from `Gq`, computing the TCV entry tables internally (Algorithms 4 + 5). */
  def compute(spark: SparkSession, gq: DataFrame, q: TspgQuery): DataFrame = {
    val f = DistTcv.forward(spark, gq, q)
    val b = DistTcv.backward(spark, gq, q)
    apply(spark, gq, q, f, b)
  }
}

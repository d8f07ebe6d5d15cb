package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TspgQuery

/** Quick upper-bound graph (paper Algorithm 2) as a two-sided join + filter:
  * `Gq = σ[A(src) < ts < D(dst)](E ⋈ A ⋈ D)`. Inner joins drop edges whose endpoint is
  * unreachable (`A = +∞` / `D = −∞` rows are simply absent from the label tables).
  */
object DistQuickUbg {

  def apply(edges: DataFrame, arrivals: DataFrame, departures: DataFrame): DataFrame = {
    val e = GraphDF.canon(edges)
    val a = arrivals.select(col("v").as("av"), col("arr"))
    val d = departures.select(col("v").as("dv"), col("dep"))
    e.join(a, e("src") === col("av"))
      .join(d, e("dst") === col("dv"))
      .where(col("arr") < col("ts") && col("ts") < col("dep"))
      .select(e("src"), e("dst"), e("ts"))
  }

  /** Full pipeline from the raw edge table (Algorithms 3 + 2). */
  def compute(spark: SparkSession, edges: DataFrame, q: TspgQuery): DataFrame = {
    val a = DistPolarity.arrivals(spark, edges, q)
    val d = DistPolarity.departures(spark, edges, q)
    apply(edges, a, d)
  }
}

package repro.data

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.dist.GraphDF

class TemporalGenSpec extends SparkSpec {

  private lazy val edges =
    SynthData.temporalEdges(spark, nVertices = 100, nEdges = 2000, nTimestamps = 50,
      alpha = 1.05, seed = 11).cache()

  test("generator is deterministic in its parameters") {
    val again = SynthData.temporalEdges(spark, 100, 2000, 50, 1.05, 11)
    assert(GraphDF.toEdgeSet(edges) == GraphDF.toEdgeSet(again))
  }

  test("different seeds give different graphs") {
    val other = SynthData.temporalEdges(spark, 100, 2000, 50, 1.05, 12)
    assert(GraphDF.toEdgeSet(edges) != GraphDF.toEdgeSet(other))
  }

  test("no self-loops") {
    assert(edges.where(col("src") === col("dst")).count() == 0)
  }

  test("edge triples are distinct") {
    assert(edges.count() == edges.distinct().count())
  }

  test("endpoints and timestamps are in range") {
    val r = edges.agg(min("src"), max("src"), min("dst"), max("dst"), min("ts"), max("ts"))
      .collect()(0)
    assert(r.getLong(0) >= 1 && r.getLong(1) <= 100)
    assert(r.getLong(2) >= 1 && r.getLong(3) <= 100)
    assert(r.getLong(4) >= 1 && r.getLong(5) <= 50)
  }

  test("realized edge count is close to (and below) the target") {
    val m = edges.count()
    assert(m <= 2000 && m > 1200, s"realized m = $m")
  }

  test("endpoint distribution is hub-skewed (Zipf)") {
    val top = edges.groupBy("src").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val meanDeg = edges.count().toDouble / 100
    assert(top > 4 * meanDeg, s"top out-degree $top vs mean $meanDeg")
  }

  test("timestamp domain is mostly covered") {
    assert(edges.select("ts").distinct().count() >= 45)
  }

  test("large timestamp domains have a bursty head (activity concentration)") {
    // On a paper-sized |T| the head window holds several times its uniform share
    // (DESIGN.md: windows carry 0.5–7% of edges, like the paper's datasets).
    val big  = SynthData.temporalEdges(spark, 100, 4000, 2000, 1.05, 13).cache()
    val m    = big.count().toDouble
    val head = big.where(col("ts") <= 20).count().toDouble
    val uniformShare = 20.0 / 2000.0
    assert(head / m > 3 * uniformShare, s"head share ${head / m} vs uniform $uniformShare")
    big.unpersist()
  }

  test("toCore round-trips the edge set") {
    val g = GraphDF.toCore(edges, n = 101)
    assert(g.m == edges.count())
    assert(GraphDF.toEdgeSet(GraphDF.fromCore(spark, g)) == GraphDF.toEdgeSet(edges))
  }

  test("dataset specs generate non-trivial graphs (smallest dataset, R1)") {
    val g = Datasets.byId("R1").generateCore(spark)
    assert(g.m > 3000 && g.vertices.size > 50)
    assert(g.timestamps.length > 100)
  }
}

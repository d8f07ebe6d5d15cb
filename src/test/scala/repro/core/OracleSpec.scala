package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.dist.GraphDF

/** Result-equality oracle tests: the exact tspG produced by VUG is checked against a
  * DuckDB recursive CTE that independently enumerates all temporal simple paths (a
  * list-typed `visited` column enforces simplicity, the `ts` comparison enforces
  * strict ascent, and paths never extend past `t`) and projects their distinct edge
  * (and vertex) sets.
  */
class OracleSpec extends SparkSpec {

  /** Encode an edge as src·10^12 + dst·10^6 + ts (ids and ts < 10^6 in every test). */
  private def tspgSql(q: TspgQuery, select: String): String =
    s"""WITH RECURSIVE walk AS (
       |  SELECT CAST(dst AS BIGINT) AS cur,
       |         CAST(ts AS BIGINT) AS lastts,
       |         [CAST(src AS BIGINT), CAST(dst AS BIGINT)] AS visited,
       |         [CAST(src AS BIGINT)*1000000000000 + CAST(dst AS BIGINT)*1000000
       |            + CAST(ts AS BIGINT)] AS eids
       |  FROM edges
       |  WHERE CAST(src AS BIGINT) = ${q.s}
       |    AND CAST(ts AS BIGINT) BETWEEN ${q.tauB} AND ${q.tauE}
       |  UNION ALL
       |  SELECT CAST(e.dst AS BIGINT),
       |         CAST(e.ts AS BIGINT),
       |         list_append(w.visited, CAST(e.dst AS BIGINT)),
       |         list_append(w.eids, CAST(e.src AS BIGINT)*1000000000000
       |            + CAST(e.dst AS BIGINT)*1000000 + CAST(e.ts AS BIGINT))
       |  FROM walk w JOIN edges e ON CAST(e.src AS BIGINT) = w.cur
       |  WHERE w.cur <> ${q.t}
       |    AND CAST(e.ts AS BIGINT) > w.lastts
       |    AND CAST(e.ts AS BIGINT) <= ${q.tauE}
       |    AND NOT list_contains(w.visited, CAST(e.dst AS BIGINT))
       |)
       |$select""".stripMargin

  private def edgesSql(q: TspgQuery): String = tspgSql(q,
    s"""SELECT DISTINCT
       |  CAST(eid // 1000000000000 AS VARCHAR) AS src,
       |  CAST((eid % 1000000000000) // 1000000 AS VARCHAR) AS dst,
       |  CAST(eid % 1000000 AS VARCHAR) AS ts
       |FROM (SELECT unnest(eids) AS eid FROM walk WHERE cur = ${q.t})""".stripMargin)

  private def verticesSql(q: TspgQuery): String = tspgSql(q,
    s"""SELECT DISTINCT CAST(v AS VARCHAR) AS v
       |FROM (SELECT unnest(visited) AS v FROM walk WHERE cur = ${q.t})""".stripMargin)

  private def edgesDf(g: TemporalGraph): DataFrame =
    GraphDF.fromCore(spark, g)
      .select(col("src").cast("string"), col("dst").cast("string"), col("ts").cast("string"))

  private def subgraphEdgesDf(sg: Subgraph): DataFrame = {
    import spark.implicits._
    sg.edges.toSeq.map(e => (e.src.toString, e.dst.toString, e.ts.toString))
      .toDF("src", "dst", "ts")
  }

  private def subgraphVerticesDf(sg: Subgraph): DataFrame = {
    import spark.implicits._
    sg.vertices.toSeq.map(_.toString).toDF("v")
  }

  private def checkAgainstOracle(g: TemporalGraph, q: TspgQuery): Unit = {
    val input = edgesDf(g)
    val got   = Vug.tspg(g, q)
    Oracle.assertEquivalent(subgraphEdgesDf(got), edgesSql(q), "edges" -> input)
    Oracle.assertEquivalent(subgraphVerticesDf(got), verticesSql(q), "edges" -> input)
  }

  test("oracle agrees on the paper running example") {
    checkAgainstOracle(PaperExample.graph, PaperExample.query)
  }

  test("oracle agrees on the narrowed window [2,6] of the paper example") {
    checkAgainstOracle(PaperExample.graph, TspgQuery(PaperExample.s, PaperExample.t, 2, 6))
  }

  test("oracle agrees on an empty result (unreachable target)") {
    checkAgainstOracle(PaperExample.graph, TspgQuery(PaperExample.a, PaperExample.s, 2, 7))
  }

  test("oracle agrees on a single-edge graph") {
    checkAgainstOracle(TemporalGraph(2, Seq(TEdge(0, 1, 3))), TspgQuery(0, 1, 1, 5))
  }

  test("oracle agrees on a graph with parallel interior edges (Lemma 11 batch)") {
    val g = TemporalGraph(6, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 3, 3),
      TEdge(2, 3, 4), TEdge(3, 4, 5), TEdge(4, 5, 6)))
    checkAgainstOracle(g, TspgQuery(0, 5, 1, 6))
  }

  test("oracle agrees on a cycle-heavy graph") {
    val g = TemporalGraph(4, Seq(TEdge(0, 1, 1), TEdge(1, 2, 2), TEdge(2, 1, 3),
      TEdge(1, 3, 4), TEdge(2, 3, 4), TEdge(3, 0, 5)))
    checkAgainstOracle(g, TspgQuery(0, 3, 1, 5))
  }

  for (seed <- 1 to 12)
    test(s"oracle agrees on random graph seed=$seed") {
      val g = Fixtures.randomGraph(seed * 77L, n = 8, m = 28, maxTs = 6)
      Fixtures.randomQueries(g, seed, 2, maxTs = 6).foreach(q => checkAgainstOracle(g, q))
    }
}

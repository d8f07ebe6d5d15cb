package repro.bench

import repro.SparkSpec
import repro.core.{PathEnum, TemporalGraph, Vug}
import repro.data.Datasets

/** Reproduces Fig. 12 / Fig. 17 (Exp-7) as a table: the number of edges in tspG vs
  * the number of temporal simple paths it contains, on R1 (~D1) and R8 (~D8) across θ.
  *
  * Shape target: paths ≫ edges and the gap widens with θ (paper: D1 θ=10 has 659
  * edges but >3M paths; D10 θ=25 has 3442 edges but >1.1B paths) -- the structural
  * argument for returning a path *graph* (and for VUG's linear space, Exp-3).
  */
class Exp7PathsEdgesBench extends SparkSpec {

  private val pathCap = 2000000L
  private val capNs   = 10L * BenchUtil.capMs * 1000000L
  private val nq      = math.max(5, BenchUtil.nQueries / 2)

  private def sweep(datasetId: String, thetas: Seq[Int]): Unit = {
    val spec = Datasets.byId(datasetId)
    val g    = BenchData.graph(spec)
    val rows = thetas.map { th =>
      val qs = BenchData.queries(spec, nq, theta = th)
      var edges = 0L
      var paths = 0L
      var capped = false
      qs.foreach { q =>
        val sg = Vug.tspg(g, q)
        edges += sg.edgeCount
        // Count paths on the (exact) tspG itself: cheapest sound search space.
        val (n, complete) = PathEnum.countPaths(sub(g, sg), q, pathCap, capNs)
        paths += n
        if (!complete) capped = true
      }
      Seq(th.toString, edges.toString, (if (capped) ">" else "") + paths.toString,
        f"${paths.toDouble / math.max(1L, edges)}%.1f")
    }
    BenchUtil.table(
      s"Exp-7 -- #edges vs #paths in tspG, ${spec.id} (${spec.paperId}), $nq queries " +
        s"(path count capped at $pathCap/query)",
      Seq("theta", "edges", "paths", "paths/edge"), rows)
    // Shape: paths outnumber edges at the largest θ.
    assert(rows.last(3).toDouble > 1.0, s"paths do not exceed edges: ${rows.last}")
  }

  private def sub(g: TemporalGraph, sg: repro.core.Subgraph): TemporalGraph =
    TemporalGraph(g.n, sg.edges)

  test("Exp-7: edges vs paths on R1") { sweep("R1", Seq(8, 10, 12)) }
  test("Exp-7: edges vs paths on R8") { sweep("R8", Seq(8, 10, 12)) }
}

package repro.bench

import repro.SparkSpec

/** Reproduces paper TABLE I (Appendix C): dataset statistics, with the paper's
  * original numbers alongside our synthetic analogues.
  */
class Table1DatasetsBench extends SparkSpec {

  test("TABLE I: dataset statistics (ours vs paper)") {
    val rows = BenchUtil.datasets.flatMap { spec =>
      val g = BenchData.graph(spec)
      Seq(
        Seq(spec.id, spec.paperId, g.vertices.size.toString, g.m.toString,
          g.timestamps.length.toString, g.maxDegree.toString, spec.theta.toString),
        Seq("", "(paper)", spec.paper.nV.toString, spec.paper.nE.toString,
          spec.paper.nT.toString, spec.paper.d.toString, spec.paper.theta.toString))
    }
    BenchUtil.table("TABLE I -- dataset statistics",
      Seq("id", "source", "|V|", "|E|", "|T|", "d", "theta"), rows)
    assert(BenchUtil.datasets.forall(s => BenchData.graph(s).m > 0))
  }
}

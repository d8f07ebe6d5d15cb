package repro.dist

import org.apache.spark.sql.DataFrame
import repro.core._

class DistTcvSpec extends DistSpecBase {
  import PaperExample._

  private def entriesMap(d: DataFrame): Map[(Int, Int), Set[Int]] =
    d.collect().map { r =>
      (r.getLong(0).toInt, r.getLong(1).toInt) ->
        r.getSeq[Long](2).map(_.toInt).toSet
    }.toMap

  private lazy val gqDf = DistQuickUbg.compute(spark, df(graph), query).localCheckpoint()

  test("forward entries on the paper example (unpruned Fig. 4(a))") {
    val got = entriesMap(DistTcv.forward(spark, gqDf, query))
    // The dist sweep skips Lemma 7 pruning, so b additionally materializes its
    // (value-identical) entry at in-ts 5; everything else matches Fig. 4(a).
    assert(got == Map(
      (b, 2) -> Set(b), (b, 5) -> Set(b),
      (c, 3) -> Set(b, c), (c, 6) -> Set(b, c),
      (f, 4) -> Set(b, c, f),
      (e, 5) -> Set(b, c, f, e)))
  }

  test("backward entries on the paper example (unpruned Fig. 4(b))") {
    val got = entriesMap(DistTcv.backward(spark, gqDf, query))
    assert(got == Map(
      (b, 6) -> Set(b), (b, 3) -> Set(b),
      (c, 7) -> Set(c), (c, 4) -> Set(c),
      (f, 5) -> Set(f),
      (e, 6) -> Set(c, e)))
  }

  test("anchors have no entries") {
    val fwd = entriesMap(DistTcv.forward(spark, gqDf, query))
    assert(!fwd.keys.exists { case (u, _) => u == s || u == t })
  }

  for (seed <- 1 to 4)
    test(s"dist TCV lookups match core lookups (random graph seed=$seed)") {
      val g = Fixtures.randomGraph(seed * 19L, n = 8, m = 24, maxTs = 5)
      Fixtures.randomQueries(g, seed + 9, 1, maxTs = 5).foreach { q =>
        val gq   = QuickUbg.compute(g, q)
        val gqD  = df(gq)
        val fwdD = entriesMap(DistTcv.forward(spark, gqD, q))
        val bwdD = entriesMap(DistTcv.backward(spark, gqD, q))
        val fwdC = Tcv.forward(gq, q)
        val bwdC = Tcv.backward(gq, q)
        // Compare via Lemma 5 lookups (the core index prunes storage; lookups agree).
        for (u <- 0 until g.n if u != q.s && u != q.t; tau <- q.tauB to q.tauE) {
          val fD = fwdD.filter { case ((v, ts), _) => v == u && ts <= tau }
            .toSeq.sortBy(-_._1._2).headOption.map(_._2)
          val fC = Option(fwdC.atOrBefore(u, tau)).map(_.toSet)
          assert(fD == fC, s"forward TCV_$tau(s,$u) mismatch for $q: dist=$fD core=$fC")
          val bD = bwdD.filter { case ((v, ts), _) => v == u && ts >= tau }
            .toSeq.sortBy(_._1._2).headOption.map(_._2)
          val bC = Option(bwdC.atOrAfter(u, tau)).map(_.toSet)
          assert(bD == bC, s"backward TCV_$tau($u,t) mismatch for $q: dist=$bD core=$bC")
        }
      }
    }
}

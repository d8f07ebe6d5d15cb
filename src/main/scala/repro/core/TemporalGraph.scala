package repro.core

import scala.collection.mutable

/** A directed temporal edge `src -> dst` at integer timestamp `ts` (paper §II,
  * `e(u, v, τ)`). Edges are set-valued: the triple `(src, dst, ts)` identifies an edge,
  * and parallel edges with distinct timestamps are distinct.
  */
final case class TEdge(src: Int, dst: Int, ts: Int)

/** An induced temporal subgraph result: `V` and `E` of a set of paths (paper Def. 2).
  *
  * `vertices` is always exactly the set of endpoints of `edges` (the paper's induced
  * subgraph convention, §II).
  */
final case class Subgraph(vertices: Set[Int], edges: Set[TEdge]) {
  def edgeCount: Int   = edges.size
  def vertexCount: Int = vertices.size
  def isEmpty: Boolean = edges.isEmpty
}

object Subgraph {
  val empty: Subgraph = Subgraph(Set.empty, Set.empty)

  /** Build from an edge collection, inducing the vertex set. */
  def ofEdges(edges: Iterable[TEdge]): Subgraph = {
    val es = edges.toSet
    Subgraph(es.flatMap(e => List(e.src, e.dst)), es)
  }
}

/** Immutable directed temporal graph over vertex ids `0 until n`.
  *
  * Storage follows the paper's requirements (§IV): the global edge array is sorted in
  * non-descending timestamp order (Algorithms 4/5 scan it forward/backward), and each
  * vertex's out-/in-neighbor list is sorted ascending by timestamp (Algorithm 3's
  * pointer scans; Algorithm 7 iterates out-neighbors in non-ascending and in-neighbors
  * in non-descending temporal order, i.e. the same arrays read backward/forward).
  *
  * Self-loops are dropped at construction: a self-loop can never lie on a simple path
  * between distinct vertices, so this loses nothing for any algorithm in the paper.
  * Duplicate `(src, dst, ts)` triples are de-duplicated (set semantics).
  */
final class TemporalGraph private (
    val n: Int,
    /** All edges, sorted by `(ts, src, dst)` non-descending. */
    val edges: Array[TEdge],
    outAdj: Array[Array[TEdge]],
    inAdj: Array[Array[TEdge]],
) {

  def m: Int = edges.length

  /** Out-edges of `u`, ascending by timestamp. */
  def outEdges(u: Int): Array[TEdge] = outAdj(u)

  /** In-edges of `u` (edges with `dst == u`), ascending by timestamp. */
  def inEdges(u: Int): Array[TEdge] = inAdj(u)

  /** Vertices incident to at least one edge (the paper's induced `V(G)`). */
  lazy val vertices: Set[Int] = {
    val b = Set.newBuilder[Int]
    var i = 0
    while (i < edges.length) { b += edges(i).src; b += edges(i).dst; i += 1 }
    b.result()
  }

  lazy val edgeSet: Set[TEdge] = edges.toSet

  /** All distinct timestamps, ascending. */
  lazy val timestamps: Array[Int] = edges.map(_.ts).distinct.sorted

  /** Largest in- or out-degree (the paper's `d`). */
  def maxDegree: Int = {
    var d = 0
    var u = 0
    while (u < n) {
      d = math.max(d, math.max(outAdj(u).length, inAdj(u).length)); u += 1
    }
    d
  }

  /** Subgraph (same vertex-id universe) of edges satisfying `p`. */
  def filterEdges(p: TEdge => Boolean): TemporalGraph =
    TemporalGraph(n, edges.iterator.filter(p))

  def toSubgraph: Subgraph = Subgraph.ofEdges(edges)

  def contains(e: TEdge): Boolean = edgeSet.contains(e)

  override def toString: String = s"TemporalGraph(n=$n, m=$m, |T|=${timestamps.length})"
}

object TemporalGraph {

  /** Construct from an edge collection; `n` must exceed every vertex id. */
  def apply(n: Int, raw: IterableOnce[TEdge]): TemporalGraph = {
    val distinct = raw.iterator.filter(e => e.src != e.dst).toArray.distinct
    distinct.foreach { e =>
      require(e.src >= 0 && e.src < n && e.dst >= 0 && e.dst < n,
        s"edge $e outside vertex universe [0, $n)")
    }
    val sorted = distinct.sortBy(e => (e.ts, e.src, e.dst))
    val outB = Array.fill(n)(mutable.ArrayBuilder.make[TEdge])
    val inB  = Array.fill(n)(mutable.ArrayBuilder.make[TEdge])
    // Insertion in global (ts, src, dst) order keeps adjacency ts-ascending.
    sorted.foreach { e => outB(e.src) += e; inB(e.dst) += e }
    new TemporalGraph(n, sorted, outB.map(_.result()), inB.map(_.result()))
  }

  /** Convenience constructor inferring `n = maxId + 1`. */
  def ofEdges(raw: IterableOnce[TEdge]): TemporalGraph = {
    val es = raw.iterator.toArray
    val n  = if (es.isEmpty) 0 else es.iterator.map(e => math.max(e.src, e.dst)).max + 1
    apply(n, es)
  }
}

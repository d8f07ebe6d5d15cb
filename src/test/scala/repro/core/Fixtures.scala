package repro.core

import scala.util.Random

/** Shared test fixtures.
  *
  * [[PaperExample]] is the running example of the paper (Fig. 1(a)) reconstructed from
  * the worked examples in the text: Example 5 fixes `N_out(s) = {(b,2),(a,3),(d,4)}`
  * and the edges `(b,d,3)`, `(a,d,5)`; Example 3 fixes `P(s,f)` / `P(f,t)` and hence
  * `(b,f,5)`, `(b,c,3)`, `(c,f,4)`, `(f,e,5)`, `(e,c,6)`, `(c,t,7)`, `(f,b,5)`,
  * `(b,t,6)`; Example 4 fixes `(s,a,3)` and `(d,t,2)`. All of Examples 1, 3–8 and the
  * Fig. 3/4 tables are reproduced from this edge set (asserted in the suites), which
  * confirms the reconstruction.
  */
object PaperExample {
  val s = 0; val a = 1; val b = 2; val c = 3; val d = 4; val e = 5; val f = 6; val t = 7

  val names: Map[Int, String] =
    Map(s -> "s", a -> "a", b -> "b", c -> "c", d -> "d", e -> "e", f -> "f", t -> "t")

  val edges: Vector[TEdge] = Vector(
    TEdge(s, b, 2), TEdge(s, a, 3), TEdge(s, d, 4),
    TEdge(b, d, 3), TEdge(b, c, 3), TEdge(b, f, 5), TEdge(b, t, 6),
    TEdge(c, f, 4), TEdge(c, t, 7),
    TEdge(f, e, 5), TEdge(f, b, 5),
    TEdge(e, c, 6),
    TEdge(a, d, 5),
    TEdge(d, t, 2),
  )

  val graph: TemporalGraph = TemporalGraph(8, edges)
  val query: TspgQuery     = TspgQuery(s, t, 2, 7)

  /** Fig. 3(c): the quick upper-bound graph Gq (8 edges). */
  val gqEdges: Set[TEdge] = Set(
    TEdge(s, b, 2), TEdge(b, c, 3), TEdge(b, t, 6), TEdge(c, f, 4),
    TEdge(c, t, 7), TEdge(f, e, 5), TEdge(f, b, 5), TEdge(e, c, 6))

  /** Fig. 4(c): the tight upper-bound graph Gt (5 edges). */
  val gtEdges: Set[TEdge] = Set(
    TEdge(s, b, 2), TEdge(b, c, 3), TEdge(b, t, 6), TEdge(c, f, 4), TEdge(c, t, 7))

  /** Fig. 1(c): tspG — the two temporal simple paths of Example 1 share e(s,b,2). */
  val tspgEdges: Set[TEdge] =
    Set(TEdge(s, b, 2), TEdge(b, c, 3), TEdge(b, t, 6), TEdge(c, t, 7))
  val tspgVertices: Set[Int] = Set(s, b, c, t)
}

object Fixtures {

  /** Deterministic small random temporal graph (for property/cross-validation tests). */
  def randomGraph(seed: Long, n: Int = 10, m: Int = 35, maxTs: Int = 8): TemporalGraph = {
    val rng = new Random(seed)
    val es  = Vector.fill(m)(TEdge(rng.nextInt(n), rng.nextInt(n), 1 + rng.nextInt(maxTs)))
    TemporalGraph(n, es)
  }

  /** Deterministic queries over a random graph; not reachability-filtered (empty tspG
    * is a case worth covering).
    */
  def randomQueries(g: TemporalGraph, seed: Long, count: Int, maxTs: Int = 8): Seq[TspgQuery] = {
    val rng = new Random(seed ^ 0x5ca1ab1eL)
    Vector.fill(count) {
      val s = rng.nextInt(g.n)
      val t = (s + 1 + rng.nextInt(g.n - 1)) % g.n
      val tauB = 1 + rng.nextInt(maxTs)
      val tauE = tauB + rng.nextInt(maxTs - tauB + 1)
      TspgQuery(s, t, tauB, tauE)
    }
  }
}

/** Independent brute-force reference, deliberately written in a different style from
  * the production code (immutable breadth-first path extension) so that shared bugs
  * are unlikely. Exponential — tiny graphs only.
  */
object TestRef {

  final case class RefPath(edges: List[TEdge], visited: Set[Int], last: Int, lastTs: Int)

  /** All temporal simple paths from `from` to `to` within the window, optionally
    * avoiding a vertex (used for polarity-time and TCV reference values).
    */
  def allPaths(g: TemporalGraph, from: Int, to: Int, tauB: Int, tauE: Int,
               avoid: Int = -1): Seq[List[TEdge]] = {
    if (from == to) return Seq(Nil)
    var frontier = List(RefPath(Nil, Set(from), from, tauB - 1))
    var done     = List.empty[List[TEdge]]
    while (frontier.nonEmpty) {
      val next = for {
        p <- frontier
        e <- g.outEdges(p.last).toList
        if e.ts > p.lastTs && e.ts >= tauB && e.ts <= tauE
        if !p.visited.contains(e.dst) && e.dst != avoid
      } yield RefPath(e :: p.edges, p.visited + e.dst, e.dst, e.ts)
      val (arrived, ongoing) = next.partition(_.last == to)
      done = done ++ arrived.map(_.edges.reverse)
      frontier = ongoing
    }
    done
  }

  /** Reference tspG. */
  def tspg(g: TemporalGraph, q: TspgQuery): Subgraph =
    Subgraph.ofEdges(allPaths(g, q.s, q.t, q.tauB, q.tauE).flatten)

  /** Reference earliest arrival (min over simple paths s→u avoiding `avoid`); equals
    * the walk-based value because cutting cycles preserves the final edge.
    */
  def refArrival(g: TemporalGraph, s: Int, u: Int, tauB: Int, tauE: Int, avoid: Int): Option[Int] =
    allPaths(g, s, u, tauB, tauE, avoid).collect { case p if p.nonEmpty => p.last.ts } match {
      case Seq() => None
      case arr   => Some(arr.min)
    }

  def refDeparture(g: TemporalGraph, u: Int, t: Int, tauB: Int, tauE: Int, avoid: Int): Option[Int] =
    allPaths(g, u, t, tauB, tauE, avoid).collect { case p if p.nonEmpty => p.head.ts } match {
      case Seq() => None
      case dep   => Some(dep.max)
    }

  /** Reference `TCV_τ(s, u)`: None when no qualifying path exists, otherwise the
    * intersection of vertex sets (minus `s`) over all simple paths `s → u` within
    * `[τb, τ]` avoiding `t` (Def. 5).
    */
  def refTcvForward(g: TemporalGraph, q: TspgQuery, u: Int, tau: Int): Option[Set[Int]] = {
    val ps = allPaths(g, q.s, u, q.tauB, tau, avoid = q.t).filter(_.nonEmpty)
    if (ps.isEmpty) None
    else Some(ps.map(p => p.flatMap(e => List(e.src, e.dst)).toSet - q.s).reduce(_ intersect _))
  }

  def refTcvBackward(g: TemporalGraph, q: TspgQuery, u: Int, tau: Int): Option[Set[Int]] = {
    val ps = allPaths(g, u, q.t, tau, q.tauE, avoid = q.s).filter(_.nonEmpty)
    if (ps.isEmpty) None
    else Some(ps.map(p => p.flatMap(e => List(e.src, e.dst)).toSet - q.t).reduce(_ intersect _))
  }
}

package repro

import repro.graph.LocalGraph
import repro.mce.{Bits, BranchGraph}

/** Small deterministic graphs and helpers shared across test suites. */
object TestGraphs {

  def of(n: Int, edges: (Int, Int)*): LocalGraph = LocalGraph.fromEdges(n, edges)

  /** Path 0-1-2-...-(n-1). */
  def path(n: Int): LocalGraph = of(n, (0 until n - 1).map(i => (i, i + 1)): _*)

  /** Cycle on n vertices. */
  def cycle(n: Int): LocalGraph =
    of(n, (0 until n).map(i => (i, (i + 1) % n)): _*)

  /** Star with center 0. */
  def star(n: Int): LocalGraph = of(n, (1 until n).map(i => (0, i)): _*)

  /** Moon–Moser graph: complete multipartite with `parts` parts of size 3 —
    * has exactly 3^parts maximal cliques.
    */
  def moonMoser(parts: Int): LocalGraph = {
    val n = 3 * parts
    val edges = for {
      u <- 0 until n; v <- (u + 1) until n
      if u / 3 != v / 3
    } yield (u, v)
    of(n, edges: _*)
  }

  /** Complete graph minus a perfect matching on 2k vertices (a 2-plex with
    * 2^k maximal cliques).
    */
  def cocktailParty(k: Int): LocalGraph = {
    val n = 2 * k
    val edges = for {
      u <- 0 until n; v <- (u + 1) until n
      if !(u / 2 == v / 2 && u % 2 == 0 && v == u + 1)
    } yield (u, v)
    of(n, edges: _*)
  }

  /** Complete graph on n vertices minus the edges of the complement graph
    * `removed` (given as pairs) — used to build arbitrary t-plexes.
    */
  def completeMinus(n: Int, removed: Seq[(Int, Int)]): LocalGraph = {
    val rem = removed.map { case (a, b) => (math.min(a, b), math.max(a, b)) }.toSet
    val edges = for {
      u <- 0 until n; v <- (u + 1) until n
      if !rem.contains((u, v))
    } yield (u, v)
    of(n, edges: _*)
  }

  /** Wrap a whole graph as a single BranchGraph with C = all vertices and
    * no consumed edges — the setting early termination operates in.
    */
  def asBranch(g: LocalGraph): (BranchGraph, Array[Long]) = {
    val bg = BranchGraph.ofWholeGraph(g)
    val c = Bits.make(math.max(1, g.n))
    (0 until g.n).foreach(Bits.set(c, _))
    (bg, c)
  }

  /** All maximal independent sets of the path graph v0-v1-...-v(L-1),
    * by brute force (L ≤ 20).
    */
  def bruteMisPath(l: Int): Vector[Vector[Int]] =
    bruteMis(l, (0 until l - 1).map(i => (i, i + 1)))

  /** All maximal independent sets of the cycle graph. */
  def bruteMisCycle(l: Int): Vector[Vector[Int]] =
    bruteMis(l, (0 until l).map(i => (i, (i + 1) % l)))

  private def bruteMis(n: Int, edges: Seq[(Int, Int)]): Vector[Vector[Int]] = {
    require(n <= 20)
    def independent(mask: Int): Boolean =
      edges.forall { case (a, b) => (mask & (1 << a)) == 0 || (mask & (1 << b)) == 0 }
    val ind = (0 until (1 << n)).filter(independent)
    // maximal = no independent strict superset
    val maximal = ind.filter { m =>
      !ind.exists(m2 => m2 != m && (m2 & m) == m)
    }
    maximal
      .map(m => (0 until n).filter(i => (m & (1 << i)) != 0).toVector)
      .sortBy(_.mkString(","))
      .toVector
  }
}

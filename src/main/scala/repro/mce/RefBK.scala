package repro.mce

import repro.graph.LocalGraph
import scala.collection.mutable.ArrayBuffer

/** Trusted reference implementations used only by tests.
  *
  * [[RefBK.enumerate]] is the plain Bron–Kerbosch recursion (no pivot, no
  * ordering, no reduction) — slow but simple enough to be obviously correct,
  * and itself differentially tested against [[RefBK.bruteForce]] (subset
  * enumeration) on tiny graphs. Every production algorithm variant must
  * produce exactly this set of cliques.
  */
object RefBK {

  /** All maximal cliques, each sorted ascending; the result list is sorted
    * lexicographically for stable comparisons.
    */
  def enumerate(g: LocalGraph): Vector[Vector[Int]] = {
    if (g.n == 0) return Vector.empty // no vertices — no maximal cliques
    val out = new ArrayBuffer[Vector[Int]]()
    def rec(s: List[Int], c: Set[Int], x: Set[Int]): Unit = {
      if (c.isEmpty && x.isEmpty) { out += s.sorted.toVector; return }
      var cw = c
      var xw = x
      for (v <- c) {
        val nv = g.neighbors(v).toSet
        rec(v :: s, cw.intersect(nv), xw.intersect(nv))
        cw -= v
        xw += v
      }
    }
    rec(Nil, (0 until g.n).toSet, Set.empty)
    out.sortBy(_.mkString(",")).toVector
  }

  /** Subset-enumeration ground truth, n ≤ 20 only. */
  def bruteForce(g: LocalGraph): Vector[Vector[Int]] = {
    require(g.n <= 20, "brute force is exponential in n")
    val n = g.n
    def isClique(mask: Int): Boolean = {
      val vs = (0 until n).filter(i => (mask & (1 << i)) != 0)
      vs.combinations(2).forall { case Seq(a, b) => g.hasEdge(a, b) }
    }
    val cliques = (1 until (1 << n)).filter(isClique)
    val maximal = cliques.filter { m =>
      !cliques.exists(m2 => m2 != m && (m2 & m) == m)
    }
    maximal
      .map(m => (0 until n).filter(i => (m & (1 << i)) != 0).toVector)
      .sortBy(_.mkString(","))
      .toVector
  }

  /** Canonical form of a collected clique list for comparisons. */
  def canon(cliques: Iterable[Array[Int]]): Vector[Vector[Int]] =
    cliques.map(_.sorted.toVector).toVector.sortBy(_.mkString(","))
}

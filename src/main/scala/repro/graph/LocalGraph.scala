package repro.graph

import scala.collection.mutable.ArrayBuffer

/** Compact CSR representation of an undirected simple graph.
  *
  * Vertices are `0 until n`. Adjacency lists are sorted, enabling
  * O(log d) membership tests and linear-merge set intersections.
  * Canonical edges are the pairs `(eu(i), ev(i))` with `eu(i) < ev(i)`,
  * sorted lexicographically, so an edge id doubles as a stable index
  * for rank arrays (truss order, degeneracy-lex order, ...).
  *
  * Instances are immutable and `Serializable` so they can be broadcast
  * to Spark executors by `repro.dist.DistMCE`.
  */
final class LocalGraph private (
    val n: Int,
    val offsets: Array[Int], // length n + 1
    val adj: Array[Int],     // length 2m, sorted per vertex
    val eu: Array[Int],      // canonical edges, u < v, sorted by (u, v)
    val ev: Array[Int],
    val edgeOffsets: Array[Int] // length n + 1: canonical edges grouped by eu
) extends Serializable {

  /** Number of undirected edges. */
  def m: Int = eu.length

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Iterate neighbors of `v` in ascending order. */
  def foreachNeighbor(v: Int)(f: Int => Unit): Unit = {
    var i = offsets(v)
    val end = offsets(v + 1)
    while (i < end) { f(adj(i)); i += 1 }
  }

  def neighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(adj, offsets(v), offsets(v + 1))

  /** O(log d) adjacency test via binary search on the smaller list. */
  def hasEdge(u: Int, v: Int): Boolean = {
    if (u == v) return false
    val (a, b) = if (degree(u) <= degree(v)) (u, v) else (v, u)
    binarySearch(adj, offsets(a), offsets(a + 1), b) >= 0
  }

  /** Canonical edge id of {u, v}, or -1 if absent. */
  def edgeId(u: Int, v: Int): Int = {
    if (u == v) return -1
    val a = math.min(u, v); val b = math.max(u, v)
    binarySearch(ev, edgeOffsets(a), edgeOffsets(a + 1), b)
  }

  /** Common neighbors of u and v (sorted), by linear merge. */
  def commonNeighbors(u: Int, v: Int): Array[Int] = {
    val out = new ArrayBuffer[Int](math.min(degree(u), degree(v)))
    var i = offsets(u); var j = offsets(v)
    val ei = offsets(u + 1); val ej = offsets(v + 1)
    while (i < ei && j < ej) {
      val a = adj(i); val b = adj(j)
      if (a == b) { out += a; i += 1; j += 1 }
      else if (a < b) i += 1
      else j += 1
    }
    out.toArray
  }

  /** Number of common neighbors without materializing them. */
  def commonNeighborCount(u: Int, v: Int): Int = {
    var c = 0
    var i = offsets(u); var j = offsets(v)
    val ei = offsets(u + 1); val ej = offsets(v + 1)
    while (i < ei && j < ej) {
      val a = adj(i); val b = adj(j)
      if (a == b) { c += 1; i += 1; j += 1 }
      else if (a < b) i += 1
      else j += 1
    }
    c
  }

  /** All canonical edges as packed (u, v) pairs — handy for tests. */
  def edgePairs: Array[(Int, Int)] = Array.tabulate(m)(i => (eu(i), ev(i)))

  private def binarySearch(a: Array[Int], from: Int, until: Int, key: Int): Int = {
    var lo = from; var hi = until - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      val v = a(mid)
      if (v < key) lo = mid + 1
      else if (v > key) hi = mid - 1
      else return mid
    }
    -1
  }
}

object LocalGraph {

  /** Build from an arbitrary multiset of directed/undirected pairs:
    * self-loops are dropped, duplicates and reversed duplicates merged.
    */
  def fromEdges(n: Int, pairs: IterableOnce[(Int, Int)]): LocalGraph = {
    val packed = new ArrayBuffer[Long]()
    val it = pairs.iterator
    while (it.hasNext) {
      val (x, y) = it.next()
      require(x >= 0 && x < n && y >= 0 && y < n, s"vertex out of range: ($x,$y) with n=$n")
      if (x != y) {
        val a = math.min(x, y); val b = math.max(x, y)
        packed += ((a.toLong << 32) | (b.toLong & 0xffffffffL))
      }
    }
    val sorted = packed.toArray
    java.util.Arrays.sort(sorted)
    var mDistinct = 0
    var i = 0
    while (i < sorted.length) {
      if (mDistinct == 0 || sorted(mDistinct - 1) != sorted(i)) {
        sorted(mDistinct) = sorted(i); mDistinct += 1
      }
      i += 1
    }
    val eu = new Array[Int](mDistinct)
    val ev = new Array[Int](mDistinct)
    i = 0
    while (i < mDistinct) {
      eu(i) = (sorted(i) >>> 32).toInt
      ev(i) = (sorted(i) & 0xffffffffL).toInt
      i += 1
    }
    val deg = new Array[Int](n)
    i = 0
    while (i < mDistinct) { deg(eu(i)) += 1; deg(ev(i)) += 1; i += 1 }
    val offsets = new Array[Int](n + 1)
    i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val cursor = java.util.Arrays.copyOf(offsets, n)
    val adj = new Array[Int](2 * mDistinct)
    i = 0
    while (i < mDistinct) {
      adj(cursor(eu(i))) = ev(i); cursor(eu(i)) += 1
      adj(cursor(ev(i))) = eu(i); cursor(ev(i)) += 1
      i += 1
    }
    // Per-vertex lists are sorted because edges were processed in
    // lexicographic canonical order for the u side; the v side gets
    // ascending u too (canonical sort is by (u, v)), so both are sorted.
    // Still sort defensively — O(m log d) on small slices.
    i = 0
    while (i < n) { java.util.Arrays.sort(adj, offsets(i), offsets(i + 1)); i += 1 }
    val edgeOffsets = new Array[Int](n + 1)
    val edgeDeg = new Array[Int](n)
    i = 0
    while (i < mDistinct) { edgeDeg(eu(i)) += 1; i += 1 }
    i = 0
    while (i < n) { edgeOffsets(i + 1) = edgeOffsets(i) + edgeDeg(i); i += 1 }
    new LocalGraph(n, offsets, adj, eu, ev, edgeOffsets)
  }

  /** Build from parallel src/dst arrays (e.g., collected from a DataFrame). */
  def fromEdgeArrays(n: Int, src: Array[Int], dst: Array[Int]): LocalGraph = {
    require(src.length == dst.length)
    fromEdges(n, src.indices.iterator.map(i => (src(i), dst(i))))
  }

  /** The empty graph on n vertices. */
  def empty(n: Int): LocalGraph = fromEdges(n, Iterator.empty)

  /** Complete graph on n vertices (test helper). */
  def complete(n: Int): LocalGraph =
    fromEdges(n, for { u <- 0 until n; v <- (u + 1) until n } yield (u, v))
}

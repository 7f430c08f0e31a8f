package repro.graph


/** An ordering of the canonical edges of a graph.
  *
  * @param rank  rank(edgeId) = position in the ordering (0-based; smaller = earlier)
  * @param bound max over all edges e of the number of common neighbors w of
  *              e's endpoints whose both cross edges are ranked *after* e —
  *              i.e. the size bound of the level-1 candidate graphs. For the
  *              truss-based ordering this is the paper's τ.
  */
final case class EdgeOrderResult(rank: Array[Int], bound: Int) extends Serializable

/** Truss-based edge ordering (Wang, Yu, Long — EBBkC [19], reused by HBBMC).
  *
  * Greedy procedure: iteratively remove from the remaining graph the edge
  * whose endpoints have the fewest common neighbors (its *support*) and
  * append it to the ordering. The maximum support at removal time is τ,
  * which bounds the candidate-graph size of every sub-branch produced by
  * edge-oriented branching, and satisfies τ < δ on graphs with at least
  * one triangle (strictly, τ ≤ δ − 1 — see [19]).
  */
object TrussOrder {

  /** Growable unboxed int stack (the generic collections box, and the bucket
    * queue sees O(#triangles) pushes).
    */
  private final class IntStack {
    private var arr = new Array[Int](8)
    var len = 0
    def push(x: Int): Unit = {
      if (len == arr.length) arr = java.util.Arrays.copyOf(arr, arr.length * 2)
      arr(len) = x; len += 1
    }
    def pop(): Int = { len -= 1; arr(len) }
    def get(i: Int): Int = arr(i)
  }

  def compute(g: LocalGraph): EdgeOrderResult = {
    val m = g.m
    if (m == 0) return EdgeOrderResult(new Array[Int](0), 0)
    // Forward triangle listing in O(δm): orient by degeneracy position and
    // find, for each vertex u, triangles among its position-later neighbors.
    // Each triangle is recorded once on each of its three edges as the pair
    // of the OTHER two edge ids, so the peeling loop below is a pure array
    // walk with no adjacency merging.
    val pos = Degeneracy.compute(g).pos
    val triCnt = new Array[Int](m)
    val tri1 = new IntStack; val tri2 = new IntStack; val tri3 = new IntStack
    val markEdge = new Array[Int](g.n) // edgeId(u,w) for marked w, else -1
    java.util.Arrays.fill(markEdge, -1)
    var u = 0
    while (u < g.n) {
      // mark position-later neighbors of u with the connecting edge id
      var p = g.offsets(u); val pe = g.offsets(u + 1)
      while (p < pe) {
        val w = g.adj(p)
        if (pos(w) > pos(u)) markEdge(w) = g.edgeId(u, w)
        p += 1
      }
      p = g.offsets(u)
      while (p < pe) {
        val a = g.adj(p)
        if (pos(a) > pos(u)) {
          val eUA = markEdge(a)
          var q = g.offsets(a); val qe = g.offsets(a + 1)
          while (q < qe) {
            val w = g.adj(q)
            if (pos(w) > pos(a) && markEdge(w) >= 0) {
              val eUW = markEdge(w)
              val eAW = g.edgeId(a, w)
              tri1.push(eUA); tri2.push(eUW); tri3.push(eAW)
              triCnt(eUA) += 1; triCnt(eUW) += 1; triCnt(eAW) += 1
            }
            q += 1
          }
        }
        p += 1
      }
      p = g.offsets(u)
      while (p < pe) { markEdge(g.adj(p)) = -1; p += 1 }
      u += 1
    }
    val nTri = tri1.len
    // CSR of (other-edge, other-edge) pairs per edge.
    val off = new Array[Int](m + 1)
    var e = 0
    while (e < m) { off(e + 1) = off(e) + triCnt(e); e += 1 }
    val otherA = new Array[Int](3 * nTri)
    val otherB = new Array[Int](3 * nTri)
    val cursor = java.util.Arrays.copyOf(off, m)
    var t = 0
    while (t < nTri) {
      val a = tri1.get(t); val b = tri2.get(t); val c = tri3.get(t)
      otherA(cursor(a)) = b; otherB(cursor(a)) = c; cursor(a) += 1
      otherA(cursor(b)) = a; otherB(cursor(b)) = c; cursor(b) += 1
      otherA(cursor(c)) = a; otherB(cursor(c)) = b; cursor(c) += 1
      t += 1
    }
    // Peel: repeatedly remove the minimum-support edge; supports = live
    // triangle counts. Bucket queue with lazy (stale-entry) deletion.
    val sup = triCnt
    val removed = new Array[Boolean](m)
    val maxSup = sup.max
    val buckets = Array.fill(maxSup + 1)(new IntStack)
    e = 0
    while (e < m) { buckets(sup(e)).push(e); e += 1 }
    val rank = new Array[Int](m)
    var tau = 0
    var nextRank = 0
    var cur = 0
    while (nextRank < m) {
      while (cur <= maxSup && buckets(cur).len == 0) cur += 1
      require(cur <= maxSup, "bucket queue exhausted before all edges ranked")
      val cand = buckets(cur).pop()
      if (!removed(cand) && sup(cand) == cur) {
        removed(cand) = true
        rank(cand) = nextRank
        tau = math.max(tau, cur)
        nextRank += 1
        var k = off(cand)
        val ke = off(cand + 1)
        while (k < ke) {
          val e1 = otherA(k); val e2 = otherB(k)
          if (!removed(e1) && !removed(e2)) {
            sup(e1) -= 1; buckets(sup(e1)).push(e1)
            sup(e2) -= 1; buckets(sup(e2)).push(e2)
            cur = math.min(cur, math.min(sup(e1), sup(e2)))
          }
          k += 1
        }
      }
    }
    EdgeOrderResult(rank, tau)
  }
}

/** Alternative level-1 edge orderings (paper Table VI) plus a generic
  * evaluator for the candidate-size bound achieved by any ordering.
  */
object EdgeOrders {

  /** The paper's default: truss-based ordering, bound = τ. */
  def truss(g: LocalGraph): EdgeOrderResult = TrussOrder.compute(g)

  /** `HBBMC-dgn`: edges sorted "alphabetically" by the degeneracy positions
    * of their endpoints — each edge oriented (earlier pos, later pos), then
    * sorted lexicographically.
    */
  def degeneracyLex(g: LocalGraph, deg: DegeneracyResult): EdgeOrderResult = {
    val keys = Array.tabulate(g.m) { e =>
      val pu = deg.pos(g.eu(e)); val pv = deg.pos(g.ev(e))
      val lo = math.min(pu, pv).toLong; val hi = math.max(pu, pv).toLong
      (lo << 32) | hi
    }
    fromKeys(g, keys)
  }

  /** `HBBMC-mdg`: edges in non-decreasing order of the trivial support
    * upper bound min(deg(u), deg(v)) − 1.
    */
  def minDegree(g: LocalGraph): EdgeOrderResult = {
    val keys = Array.tabulate(g.m) { e =>
      val d = math.min(g.degree(g.eu(e)), g.degree(g.ev(e))).toLong
      (d << 32) | e.toLong // edge id tie-break keeps the sort stable
    }
    fromKeys(g, keys)
  }

  private def fromKeys(g: LocalGraph, keys: Array[Long]): EdgeOrderResult = {
    val ids = Array.tabulate(g.m)(identity)
    val boxed = ids.map(Integer.valueOf)
    java.util.Arrays.sort(boxed, (a: Integer, b: Integer) => java.lang.Long.compare(keys(a), keys(b)))
    val rank = new Array[Int](g.m)
    var i = 0
    while (i < g.m) { rank(boxed(i)) = i; i += 1 }
    EdgeOrderResult(rank, achievedBound(g, rank))
  }

  /** The candidate-size bound an ordering actually achieves: for each edge e,
    * count the common neighbors w of its endpoints with both cross edges
    * ranked after e; take the max. For the truss ordering this equals τ.
    */
  def achievedBound(g: LocalGraph, rank: Array[Int]): Int = {
    var best = 0
    var e = 0
    while (e < g.m) {
      val u = g.eu(e); val v = g.ev(e)
      val r = rank(e)
      var c = 0
      val common = g.commonNeighbors(u, v)
      var i = 0
      while (i < common.length) {
        val w = common(i)
        if (rank(g.edgeId(u, w)) > r && rank(g.edgeId(v, w)) > r) c += 1
        i += 1
      }
      best = math.max(best, c)
      e += 1
    }
    best
  }
}

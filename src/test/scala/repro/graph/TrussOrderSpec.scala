package repro.graph

import repro.{SparkSpec, TestGraphs}
import scala.util.Random

class TrussOrderSpec extends SparkSpec {

  test("empty and edgeless graphs") {
    assert(TrussOrder.compute(LocalGraph.empty(5)).bound == 0)
    assert(TrussOrder.compute(LocalGraph.empty(5)).rank.isEmpty)
  }

  test("triangle-free graph has tau 0") {
    assert(TrussOrder.compute(TestGraphs.path(10)).bound == 0)
    assert(TrussOrder.compute(TestGraphs.cycle(10)).bound == 0)
    assert(TrussOrder.compute(TestGraphs.star(10)).bound == 0)
  }

  test("complete graph K_n has tau n-2") {
    // Removing edges one by one, the first removal sees n-2 common neighbors.
    assert(TrussOrder.compute(LocalGraph.complete(6)).bound == 4)
    assert(TrussOrder.compute(LocalGraph.complete(3)).bound == 1)
  }

  test("rank is a permutation of 0 until m") {
    val g = GraphGen.randomGnp(30, 0.3, 7)
    val r = TrussOrder.compute(g)
    assert(r.rank.toSeq.sorted == (0 until g.m))
  }

  test("bound equals the generic achieved-bound evaluator") {
    for (seed <- 0 until 8) {
      val g = GraphGen.randomGnp(25, 0.35, seed)
      val r = TrussOrder.compute(g)
      assert(EdgeOrders.achievedBound(g, r.rank) == r.bound)
    }
  }

  for (seed <- 0 until 10)
    test(s"tau < delta (paper property), seed=$seed") {
      val rng = new Random(seed)
      val g = GraphGen.randomGnp(10 + rng.nextInt(30), 0.1 + rng.nextDouble() * 0.4, seed + 50)
      if (g.m > 0) {
        val tau = TrussOrder.compute(g).bound
        val delta = Degeneracy.compute(g).delta
        assert(tau < delta, s"tau=$tau delta=$delta")
      }
    }

  test("truss ordering is at least as tight as degeneracy-lex and min-degree") {
    for (seed <- 0 until 6) {
      val g = GraphGen.randomGnp(30, 0.3, seed + 500)
      val truss = EdgeOrders.truss(g).bound
      val dgn = EdgeOrders.degeneracyLex(g, Degeneracy.compute(g)).bound
      val mdg = EdgeOrders.minDegree(g).bound
      assert(truss <= dgn, s"truss=$truss dgn=$dgn")
      assert(truss <= mdg, s"truss=$truss mdg=$mdg")
    }
  }

  test("alternative orderings are permutations too") {
    val g = GraphGen.randomGnp(30, 0.25, 9)
    val dgn = EdgeOrders.degeneracyLex(g, Degeneracy.compute(g))
    val mdg = EdgeOrders.minDegree(g)
    assert(dgn.rank.toSeq.sorted == (0 until g.m))
    assert(mdg.rank.toSeq.sorted == (0 until g.m))
  }

  test("min-degree ordering sorts by endpoint min degree") {
    val g = GraphGen.randomGnp(20, 0.3, 10)
    val r = EdgeOrders.minDegree(g).rank
    val key = (e: Int) => math.min(g.degree(g.eu(e)), g.degree(g.ev(e)))
    val byRank = (0 until g.m).sortBy(r(_))
    byRank.sliding(2).foreach {
      case Seq(a, b) => assert(key(a) <= key(b))
      case _         =>
    }
  }

  test("tau bounds the level-1 candidate size on the paper-suite generator") {
    val cfg = GraphGen.DatasetConfig("T", "t", 400, 3, 30, 5, 9, 0, 77)
    val g = GraphGen.generate(cfg)
    val r = TrussOrder.compute(g)
    // By definition of achievedBound every level-1 branch has ≤ bound
    // candidates; spot-check directly.
    val rank = r.rank
    var maxC = 0
    for (e <- 0 until g.m) {
      val u = g.eu(e); val v = g.ev(e)
      val c = g.commonNeighbors(u, v).count { w =>
        rank(g.edgeId(u, w)) > rank(e) && rank(g.edgeId(v, w)) > rank(e)
      }
      maxC = math.max(maxC, c)
    }
    assert(maxC == r.bound)
  }
}

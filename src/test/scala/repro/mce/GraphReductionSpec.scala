package repro.mce

import repro.{SparkSpec, TestGraphs}
import repro.graph.{GraphGen, LocalGraph}
import scala.util.Random

class GraphReductionSpec extends SparkSpec {

  private def run(g: LocalGraph): (Vector[Vector[Int]], GraphReduction.Result) = {
    val sink = new CollectSink
    val res = GraphReduction.reduce(g, sink)
    (RefBK.canon(sink.cliques), res)
  }

  test("path collapses entirely with its edges emitted") {
    val g = TestGraphs.path(6)
    val (direct, res) = run(g)
    assert(res.reduced.n == 0)
    assert(direct == RefBK.enumerate(g))
  }

  test("isolated vertices are emitted as singletons") {
    val g = LocalGraph.empty(3)
    val (direct, res) = run(g)
    assert(direct == Vector(Vector(0), Vector(1), Vector(2)))
    assert(res.reduced.n == 0)
  }

  test("pendant attached to a triangle is emitted, triangle survives check") {
    // 0-1-2 triangle, 3 pendant on 0: GR removes 3 (emitting {0,3}) and then
    // the triangle itself (degree 2) directly.
    val g = TestGraphs.of(4, (0, 1), (0, 2), (1, 2), (0, 3))
    val (direct, res) = run(g)
    assert(direct == RefBK.enumerate(g))
    assert(res.reduced.n == 0)
  }

  test("dense core survives reduction") {
    val g = LocalGraph.complete(6)
    val (direct, res) = run(g)
    assert(direct.isEmpty)
    assert(res.reduced.n == 6 && res.reduced.m == 15)
    assert(!res.removedAny)
  }

  test("pendant chain into a clique") {
    // K5 on 0..4 plus chain 4-5-6-7
    val edges = (for (u <- 0 to 4; v <- (u + 1) to 4) yield (u, v)) ++
      Seq((4, 5), (5, 6), (6, 7))
    val g = TestGraphs.of(8, edges: _*)
    val (direct, res) = run(g)
    assert(direct == Vector(Vector(4, 5), Vector(5, 6), Vector(6, 7)))
    assert(res.reduced.n == 5)
    assert(res.oldId.toSeq == Seq(0, 1, 2, 3, 4))
  }

  test("two pendants on the same vertex both emit") {
    val g = TestGraphs.of(3, (0, 1), (0, 2))
    val (direct, _) = run(g)
    assert(direct == Vector(Vector(0, 1), Vector(0, 2)))
  }

  test("isolated edge emits once, no spurious singleton") {
    val g = TestGraphs.of(2, (0, 1))
    val (direct, _) = run(g)
    assert(direct == Vector(Vector(0, 1)))
  }

  test("triangle with all degrees 2 emits once") {
    val g = TestGraphs.cycle(3)
    val (direct, _) = run(g)
    assert(direct == Vector(Vector(0, 1, 2)))
  }

  test("square (C4) emits its four edges") {
    val g = TestGraphs.cycle(4)
    val (direct, _) = run(g)
    assert(direct == RefBK.enumerate(g))
  }

  for (seed <- 0 until 20)
    test(s"GR emissions + reduced-graph cliques = all maximal cliques, seed=$seed") {
      val rng = new Random(seed)
      val n = 8 + rng.nextInt(30)
      val g = GraphGen.randomGnp(n, 0.05 + rng.nextDouble() * 0.2, seed + 400)
      val (direct, res) = run(g)
      // Enumerate the reduced graph with the reference and translate back;
      // small (≤2) cliques must be re-checked against the original graph.
      val rest = RefBK.enumerate(res.reduced).map(_.map(res.oldId)).filter { c =>
        if (c.size == 1) g.degree(c.head) == 0
        else if (c.size == 2) g.commonNeighborCount(c(0), c(1)) == 0
        else true
      }
      val all = (direct ++ rest.map(_.sorted.toVector)).sortBy(_.mkString(","))
      assert(all == RefBK.enumerate(g))
      assert(all.distinct == all)
    }

  test("reduced graph has minimum degree >= 3") {
    val g = GraphGen.randomGnp(60, 0.12, 999)
    val (_, res) = run(g)
    (0 until res.reduced.n).foreach(v => assert(res.reduced.degree(v) >= 3))
  }
}

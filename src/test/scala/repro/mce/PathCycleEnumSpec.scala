package repro.mce

import repro.{SparkSpec, TestGraphs}

/** Algorithms 6 and 7: maximal cliques induced by a complement path/cycle
  * are exactly the maximal independent sets of that path/cycle. Checked
  * against subset-enumeration ground truth for every length up to 16.
  */
class PathCycleEnumSpec extends SparkSpec {

  private def canon(xs: Iterable[Array[Int]]): Vector[Vector[Int]] =
    xs.map(_.sorted.toVector).toVector.sortBy(_.mkString(","))

  for (l <- 2 to 16)
    test(s"Enum_from_Path matches brute-force MIS, |p|=$l") {
      val got = canon(EarlyTermination.enumFromPath(Array.tabulate(l)(identity)))
      val want = TestGraphs.bruteMisPath(l)
      assert(got == want, s"got=$got want=$want")
    }

  for (l <- 3 to 16)
    test(s"Enum_from_Cycle matches brute-force MIS, |c|=$l") {
      val got = canon(EarlyTermination.enumFromCycle(Array.tabulate(l)(identity)))
      val want = TestGraphs.bruteMisCycle(l)
      assert(got == want, s"got=$got want=$want")
    }

  test("path of 2 yields the two singletons") {
    assert(canon(EarlyTermination.enumFromPath(Array(7, 9))) == Vector(Vector(7), Vector(9)))
  }

  test("cycle special cases use the paper's explicit sets") {
    assert(canon(EarlyTermination.enumFromCycle(Array(0, 1, 2))) ==
      Vector(Vector(0), Vector(1), Vector(2)))
    assert(canon(EarlyTermination.enumFromCycle(Array(0, 1, 2, 3))) ==
      Vector(Vector(0, 2), Vector(1, 3)))
    assert(EarlyTermination.enumFromCycle(Array(0, 1, 2, 3, 4)).length == 5)
  }

  test("no duplicates are produced") {
    for (l <- 2 to 14) {
      val p = canon(EarlyTermination.enumFromPath(Array.tabulate(l)(identity)))
      assert(p.distinct == p)
    }
    for (l <- 3 to 14) {
      val c = canon(EarlyTermination.enumFromCycle(Array.tabulate(l)(identity)))
      assert(c.distinct == c)
    }
  }
}

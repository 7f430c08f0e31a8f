package repro.jobs

import repro.graph.GraphGen
import repro.mce._

/** Diagnostic: hunt for a minimal graph where a config diverges from plain BK. */
object BugHuntJob {
  def main(args: Array[String]): Unit = {
    val cfg = MceConfig.hbbmcDepth(2)
    var found = 0
    var seed = 0
    while (seed < 4000 && found < 3) {
      val rng = new scala.util.Random(seed)
      val n = 6 + rng.nextInt(20)
      val p = 0.3 + rng.nextDouble() * 0.5
      val g = GraphGen.randomGnp(n, p, seed + 1000000)
      val want = RefBK.enumerate(g)
      val (got, _) = Engine.collectLocal(g, cfg)
      if (got != want) {
        found += 1
        println(s"MISMATCH seed=$seed n=$n p=$p got=${got.size} want=${want.size}")
        println(s"  edges=${g.edgePairs.toSeq}")
        println(s"  extra=${got.diff(want)} missing=${want.diff(got)}")
        println(s"  dupes=${got.groupBy(identity).filter(_._2.size > 1).keys}")
      }
      seed += 1
    }
    if (found == 0) println("no mismatch found in 4000 random graphs; trying pockets")
    if (found == 0) {
      var s2 = 0
      while (s2 < 300 && found < 3) {
        val c = GraphGen.DatasetConfig("T", "t", 80, 2, 5, 4, 8, 0, s2, 2, 18, 24, 0.55)
        val g = GraphGen.generate(c)
        val want = RefBK.enumerate(g)
        val (got, _) = Engine.collectLocal(g, cfg)
        if (got != want) {
          found += 1
          println(s"POCKET MISMATCH seed=$s2 got=${got.size} want=${want.size}")
          println(s"  extra=${got.diff(want).take(5)} missing=${want.diff(got).take(5)}")
          println(s"  dupes=${got.groupBy(identity).filter(_._2.size > 1).keys.take(5)}")
        }
        s2 += 1
      }
      if (found == 0) println("no pocket mismatch either")
    }
  }
}

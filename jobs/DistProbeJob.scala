package repro.jobs

import repro.bench.BenchTables
import repro.mce._

/** Diagnostic: DistMCE phase timing and partition balance. */
object DistProbeJob {
  def main(args: Array[String]): Unit = {
    val name = if (args.nonEmpty) args(0) else "DG"
    val spark = JobSession.session("dist-probe")
    try {
      val g = BenchTables.dataset(name)
      val t0 = System.nanoTime()
      val prep = Engine.prepare(g, MceConfig.hbbmcPP)
      println(f"prepare: ${(System.nanoTime() - t0) / 1e6}%.0f ms, units=${prep.units}")
      // per-anchor work estimate: edges per anchor
      val sizes = (0 until prep.units).map(i => prep.anchorOff(i + 1) - prep.anchorOff(i))
      println(s"anchor edge-counts: max=${sizes.max} top5=${sizes.sorted.reverse.take(5)}")
      // replicate DistMCE.run but return the in-task phase timings
      import spark.implicits._
      val bc = spark.sparkContext.broadcast(prep)
      for (par <- Seq(1, 16)) {
        val t1 = System.nanoTime()
        val rows = spark.range(0, prep.units.toLong).as[Long]
          .repartition(par)
          .mapPartitions { it =>
            val p = bc.value
            val tIn = System.nanoTime()
            val counters = new Counters
            val counting = new CountingSink
            val translated = Engine.translatingSink(p, counting)
            val ws = Engine.workspace(p)
            it.foreach(u => Engine.solveUnit(p, u.toInt, ws, counters, translated))
            Iterator.single((counting.count, counters.buildNanos, counters.solveNanos,
              System.nanoTime() - tIn, counters.calls))
          }.collect()
        val wall = (System.nanoTime() - t1) / 1e6
        val build = rows.map(_._2).sum / 1e6
        val solve = rows.map(_._3).sum / 1e6
        val inTask = rows.map(_._4).sum / 1e6
        println(f"par=$par%4d wall=$wall%8.0f ms aggBuild=$build%8.0f aggSolve=$solve%8.0f aggInTask=$inTask%8.0f cliques=${rows.map(_._1).sum} calls=${rows.map(_._5).sum}")
      }
    } finally spark.stop()
  }
}

package repro.jobs

import repro.bench.BenchTables
import repro.mce._

/** Diagnostic: HBBMC++ vs RDegen across the whole dataset suite. */
object SuiteProbeJob {
  def main(args: Array[String]): Unit = {
    BenchTables.warmup()
    val sink = new CliqueSink { override def emit(v: Array[Int], l: Int): Unit = () }
    println(f"${"ds"}%-4s ${"hbbmc++"}%10s ${"hbbmc+"}%10s ${"rdegen"}%10s ${"cliques"}%10s ${"callsH"}%10s ${"callsR"}%10s")
    for (name <- BenchTables.datasetNames) {
      val g = BenchTables.dataset(name)
      def run(cfg: MceConfig) = {
        System.gc()
        val t0 = System.nanoTime()
        val st = Engine.runLocal(g, cfg, sink)
        ((System.nanoTime() - t0) / 1e6, st)
      }
      val (tpp, spp) = run(MceConfig.hbbmcPP)
      val (tp, _) = run(MceConfig.hbbmcP)
      val (tr, sr) = run(MceConfig.rDegen)
      require(spp.cliques == sr.cliques)
      println(f"$name%-4s $tpp%10.1f $tp%10.1f $tr%10.1f ${spp.cliques}%10d ${spp.calls}%10d ${sr.calls}%10d")
    }
  }
}

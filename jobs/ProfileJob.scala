package repro.jobs

import repro.bench.BenchTables
import repro.graph.{Degeneracy, EdgeOrders}
import repro.mce._

/** Diagnostic: time the phases of one configuration on one dataset.
  * Usage: ProfileJob [dataset] — prints GR / ordering / branch-solve split.
  */
object ProfileJob {
  def main(args: Array[String]): Unit = {
    val name = if (args.nonEmpty) args(0) else "DB"
    val g = BenchTables.dataset(name)
    def ms[T](f: => T): (T, Double) = {
      val t0 = System.nanoTime(); val r = f; (r, (System.nanoTime() - t0) / 1e6)
    }
    for (round <- 1 to 3) {
      val sinkGr = new CollectSink
      val (gr, tGr) = ms(repro.mce.GraphReduction.reduce(g, sinkGr))
      val (_, tDeg) = ms(Degeneracy.compute(gr.reduced))
      val (truss, tTruss) = ms(EdgeOrders.truss(gr.reduced))
      val (prep, tPrep) = ms(Engine.prepare(g, MceConfig.hbbmcPP))
      val sink = new CountingSink
      val counters = new Counters
      val translated = Engine.translatingSink(prep, sink)
      val wsE = Engine.workspace(prep)
      val (_, tSolve) = ms {
        var u = 0
        while (u < prep.units) { Engine.solveUnit(prep, u, wsE, counters, translated); u += 1 }
      }
      val prepV = Engine.prepare(g, MceConfig.rDegen)
      val sinkV = new CountingSink
      val countersV = new Counters
      val translatedV = Engine.translatingSink(prepV, sinkV)
      val wsV = Engine.workspace(prepV)
      val (_, tSolveV) = ms {
        var u = 0
        while (u < prepV.units) { Engine.solveUnit(prepV, u, wsV, countersV, translatedV); u += 1 }
      }
      println(f"[$name round $round] n=${g.n} m=${g.m} reduced(n=${gr.reduced.n}, m=${gr.reduced.m}) tau=${truss.bound}")
      println(f"  GR=$tGr%.1fms degen=$tDeg%.1fms truss=$tTruss%.1fms prepTotal=$tPrep%.1fms")
      println(f"  HBBMC solve=$tSolve%.1fms (calls=${counters.calls})  RDegen solve=$tSolveV%.1fms (calls=${countersV.calls})")
    }
  }
}

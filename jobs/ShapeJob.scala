package repro.jobs

import repro.graph.GraphGen
import repro.mce._

/** Diagnostic: compare algorithm times on a single parameterized instance.
  * Usage: ShapeJob n baDeg nCliques cMin cMax window nPockets pMin pMax pP
  */
object ShapeJob {
  def main(args: Array[String]): Unit = {
    val a = args.map(_.toDouble)
    def ai(i: Int, d: Int) = if (a.length > i) a(i).toInt else d
    def ad(i: Int, d: Double) = if (a.length > i) a(i) else d
    val cfg = GraphGen.DatasetConfig("X", "x", ai(0, 3000), ai(1, 3), ai(2, 100),
      ai(3, 5), ai(4, 10), ai(5, 0), 999, ai(6, 2), ai(7, 80), ai(8, 100), ad(9, 0.55),
      hubBias = ai(10, 0) == 1, nHubs = ai(11, 0), hubDeg = ai(12, 0))
    val g = GraphGen.generate(cfg)
    println(s"n=${g.n} m=${g.m}")
    val algos = Seq(
      "HBBMC++" -> MceConfig.hbbmcPP,
      "HBBMC+" -> MceConfig.hbbmcP,
      "RDegen" -> MceConfig.rDegen,
      "RRef" -> MceConfig.rRef,
      "RRcd" -> MceConfig.rRcd,
      "RFac" -> MceConfig.rFac
    )
    val sink = new CliqueSink { override def emit(v: Array[Int], l: Int): Unit = () }
    for (round <- 1 to 3; (name, cfgA) <- algos) {
      System.gc()
      val t0 = System.nanoTime()
      val prep = Engine.prepare(g, cfgA)
      val t1 = System.nanoTime()
      val counting = new CountingSink
      val counters = new Counters
      val translated = Engine.translatingSink(prep, counting)
      val ws = Engine.workspace(prep)
      var u = 0
      while (u < prep.units) { Engine.solveUnit(prep, u, ws, counters, translated); u += 1 }
      val ms = (System.nanoTime() - t0) / 1e6
      val prepMs = (t1 - t0) / 1e6
      if (round == 3)
        println(f"$name%-10s $ms%8.1f ms (prep=$prepMs%6.1f build=${counters.buildNanos/1e6}%6.1f solve=${counters.solveNanos/1e6}%6.1f) cliques=${counting.count}%-8d calls=${counters.calls}%-9d et=${counters.etApplied}")
    }
  }
}

package repro.jobs

import repro.bench.BenchTables
import repro.mce._

/** Diagnostic: parallel anchors with plain threads (no Spark). */
object ThreadProbeJob {
  def main(args: Array[String]): Unit = {
    val g = BenchTables.dataset(if (args.nonEmpty) args(0) else "DG")
    val prep = Engine.prepare(g, MceConfig.hbbmcPP)
    // sequential baseline
    val t0 = System.nanoTime()
    val c0 = new Counters; val s0 = new CountingSink
    val tr0 = Engine.translatingSink(prep, s0); val ws0 = Engine.workspace(prep)
    (0 until prep.units).foreach(u => Engine.solveUnit(prep, u, ws0, c0, tr0))
    println(f"seq: ${(System.nanoTime() - t0) / 1e6}%.0f ms cliques=${s0.count}")
    // simulate a broadcast: run on a serialize/deserialize round-trip of prep
    val bos = new java.io.ByteArrayOutputStream()
    val oos = new java.io.ObjectOutputStream(bos)
    oos.writeObject(prep); oos.close()
    println(s"serialized prep: ${bos.size() / 1024} KB")
    val prep2 = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bos.toByteArray))
      .readObject().asInstanceOf[Prepared]
    val t2 = System.nanoTime()
    val c2 = new Counters; val s2 = new CountingSink
    val tr2 = Engine.translatingSink(prep2, s2); val ws2 = Engine.workspace(prep2)
    (0 until prep2.units).foreach(u => Engine.solveUnit(prep2, u, ws2, c2, tr2))
    println(f"seq-on-deserialized: ${(System.nanoTime() - t2) / 1e6}%.0f ms cliques=${s2.count}")
    for (nt <- Seq(2, 4, 16)) {
      val t1 = System.nanoTime()
      val total = new java.util.concurrent.atomic.AtomicLong()
      val next = new java.util.concurrent.atomic.AtomicInteger()
      val threads = (0 until nt).map { _ =>
        new Thread(() => {
          val c = new Counters; val s = new CountingSink
          val tr = Engine.translatingSink(prep, s); val ws = Engine.workspace(prep)
          var u = next.getAndIncrement()
          while (u < prep.units) { Engine.solveUnit(prep, u, ws, c, tr); u = next.getAndIncrement() }
          total.addAndGet(s.count)
        })
      }
      threads.foreach(_.start()); threads.foreach(_.join())
      println(f"threads=$nt%3d: ${(System.nanoTime() - t1) / 1e6}%.0f ms cliques=${total.get}")
    }
  }
}

package repro.jobs

import repro.BipartiteGen
import repro.bipartite._

/** Scratch profiler: runs only the local kernels on one dataset+side and
  * prints per-engine wall times — used to budget the bench suites.
  */
object LocalProbe {
  def main(args: Array[String]): Unit = {
    val tag = if (args.nonEmpty) args(0) else "TrU"
    val (name, side) = (tag.dropRight(1), tag.takeRight(1))
    val g0 = BipartiteGen.generate(BipartiteGen.byName(name))
    val g = if (side == "U") g0 else g0.transpose
    val threads = math.min(16, Runtime.getRuntime.availableProcessors())

    def time[A](label: String)(f: => A): A = {
      val t0 = System.nanoTime(); val r = f
      println(f"$label%-12s ${(System.nanoTime() - t0) / 1e9}%.2f s"); r
    }
    val bup  = time("BUP")     { BUP.run(g, countThreads = threads) }
    val parb = time("ParB")    { ParB.run(g, threads) }
    val rec  = time("RECEIPT") { ReceiptLocal.run(g, ReceiptLocal.Config(P = 15, threads = threads)) }
    require(bup.tips.toSeq == parb.tips.toSeq && bup.tips.toSeq == rec.tips.toSeq, "tips diverge")
    println(s"wedges: BUP=${bup.metrics.totalWedges} REC=${rec.metrics.totalWedges} " +
      s"rho: ParB=${parb.metrics.rounds} REC=${rec.metrics.rounds} hucTriggers=${rec.metrics.hucTriggers} subsets=${rec.metrics.subsets}")
  }
}

package repro.bipartite

/** Metrics common to the peeling kernels.
  *
  * @param cntWedges  wedges traversed by butterfly counting (initial pvBcnt
  *                   plus, for RECEIPT, any HUC re-counts)
  * @param peelWedges wedges traversed by peeling `update` calls
  * @param rounds     synchronization rounds ρ: peeling iterations with a
  *                   barrier (batch rounds for ParB, CD iterations for
  *                   RECEIPT; 0 extra for FD, whose tasks sync only once)
  */
final case class PeelMetrics(
    cntWedges: Long,
    peelWedges: Long,
    rounds: Long,
    cntTimeMs: Double,
    peelTimeMs: Double
) {
  def totalWedges: Long = cntWedges + peelWedges
  def totalTimeMs: Double = cntTimeMs + peelTimeMs
}

final case class TipResult(tips: Array[Long], metrics: PeelMetrics)

/** Sequential Bottom-Up Peeling (alg. 2) — the paper's exact baseline and
  * also the inner engine RECEIPT FD applies to each induced subgraph.
  *
  * Minimum-support retrieval uses a lazy-deletion binary min-heap (the
  * paper's implementation note: a k-way min-heap beat both Julienne-style
  * bucketing and Fibonacci heaps in practice; a binary heap has the same
  * asymptotics as k-way and is the natural Scala analogue).
  */
object BUP {
  import Peeling._

  /** Full tip decomposition of `g`'s U side: counts butterflies, then peels.
    * @param countThreads threads for the initial pvBcnt (the baseline tables
    *                     time pvBcnt separately from the sequential peel)
    */
  def run(g: BipartiteGraph, countThreads: Int = 1): TipResult = {
    val t0 = System.nanoTime()
    val counts = ButterflyCounting.vertexPriority(g, countThreads)
    val t1 = System.nanoTime()
    val members = Array.tabulate(g.nU)(identity)
    val r = peel(g, counts.cntU, members, enableDGM = false)
    TipResult(
      r.tips,
      r.metrics.copy(cntWedges = counts.wedges, cntTimeMs = (t1 - t0) / 1e6)
    )
  }

  /** Peel `members ⊆ U` of `g` with supports initialized from `initSup`
    * (indexed by vertex id). Vertices outside `members` are treated as
    * absent — callers pass an induced subgraph whose other U vertices have
    * empty adjacency (RECEIPT FD) or the full vertex set (baseline BUP).
    * Returns tips (entries for non-members are -1).
    */
  def peel(g: BipartiteGraph, initSup: Array[Long], members: Array[Int],
           enableDGM: Boolean): TipResult = {
    val t0 = System.nanoTime()
    val st = new PeelState(g, enableDGM)
    val inSet = new Array[Boolean](g.nU)
    members.foreach(inSet(_) = true)
    // Non-members must not receive updates nor be popped: kill their flags.
    var u = 0
    while (u < g.nU) { if (!inSet(u)) st.alive(u) = false; u += 1 }

    val heap = new LongMinHeap(members.length + 16)
    members.foreach { v => st.sup.set(v, initSup(v)); heap.push(pack(initSup(v), v)) }

    val tips = Array.fill[Long](g.nU)(-1L)
    val wdg = new Array[Int](g.nU)
    val touched = new Array[Int](g.nU)
    var peelWedges = 0L
    var remaining = members.length

    while (remaining > 0) {
      val top = heap.pop()
      val u0 = unpackId(top)
      val s0 = unpackSup(top)
      if (st.alive(u0) && st.sup.get(u0) == s0) { // not stale
        tips(u0) = s0
        st.markPeeled(u0)
        remaining -= 1
        val w = st.update(u0, s0, wdg, touched, (u2, ns) => heap.push(pack(ns, u2)))
        peelWedges += w
        st.chargeWedges(w)
      }
    }
    val t1 = System.nanoTime()
    TipResult(tips, PeelMetrics(0L, peelWedges, 0L, 0.0, (t1 - t0) / 1e6))
  }
}

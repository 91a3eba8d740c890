package repro.bipartite

import org.scalatest.funsuite.AnyFunSuite

class ParBSpec extends AnyFunSuite {

  for (seed <- 0 until 15)
    test(s"ParB tips equal BUP tips (seed=$seed)") {
      val nU = 15 + 4 * seed
      val nV = 10 + 3 * seed
      val g = BipartiteGraph.random(nU, nV, 5 * (nU + nV), seed)
      val bup = BUP.run(g).tips
      val parb = ParB.run(g, threads = 4).tips
      assert(parb.toSeq == bup.toSeq, s"seed=$seed")
    }

  test("ParB with 1 thread equals ParB with 8 threads") {
    val g = BipartiteGraph.random(120, 90, 1500, seed = 5)
    val a = ParB.run(g, threads = 1).tips
    val b = ParB.run(g, threads = 8).tips
    assert(a.toSeq == b.toSeq)
  }

  test("ParB traverses the same wedges as BUP (no DGM in either)") {
    val g = BipartiteGraph.random(80, 60, 900, seed = 9)
    val bup = BUP.run(g)
    val parb = ParB.run(g, threads = 4)
    assert(parb.metrics.peelWedges == bup.metrics.peelWedges)
    assert(parb.metrics.peelWedges == g.peelCostU.sum)
  }

  test("ρ is at least the number of distinct tip values and at most |U|") {
    val g = BipartiteGraph.random(100, 70, 1200, seed = 13)
    val r = ParB.run(g, threads = 4)
    val distinctTips = r.tips.toSet.size
    assert(r.metrics.rounds >= distinctTips)
    assert(r.metrics.rounds <= g.nU)
  }

  test("K_{3,3} peels in one round") {
    val r = ParB.run(BipartiteGraph.complete(3, 3), threads = 2)
    assert(r.metrics.rounds == 1L)
    assert(r.tips.forall(_ == 6L))
  }

  test("butterfly-free graph peels in one round at support 0") {
    val star = BipartiteGraph.fromEdges(6, 1, (0 until 6).map(u => (u, 0)))
    val r = ParB.run(star, threads = 2)
    assert(r.metrics.rounds == 1L)
    assert(r.tips.forall(_ == 0L))
  }
}

package repro.core

import org.apache.spark.sql.functions._
import repro.{BipartiteGen, SparkSpec}
import repro.bipartite.BipartiteGraph

class BipartiteDFSpec extends SparkSpec {

  test("canonical deduplicates and casts") {
    import spark.implicits._
    val df = Seq((1, 2), (1, 2), (3, 4)).toDF("u", "v")
    val c = BipartiteDF.canonical(df)
    assert(c.count() == 2)
    assert(c.schema("u").dataType.typeName == "long")
  }

  test("degrees match the local graph") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 40, 30, 250, seed = 1)
    val du = BipartiteDF.degreesU(df).collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    val dv = BipartiteDF.degreesV(df).collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    for (u <- 0 until g.nU if g.degU(u) > 0) assert(du(u.toLong) == g.degU(u))
    for (v <- 0 until g.nV if g.degV(v) > 0) assert(dv(v.toLong) == g.degV(v))
  }

  test("wedgesEndpointsU matches Σ_v C(d_v,2)") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 50, 35, 400, seed = 2)
    assert(BipartiteDF.wedgesEndpointsU(df) == g.wedgesEndpointsU)
  }

  test("toLocal round-trips the edge set") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 30, 20, 200, seed = 3)
    val back = BipartiteDF.toLocal(df, g.nU, g.nV)
    assert(back.m == g.m)
    for (u <- 0 until g.nU) assert(back.degU(u) == g.degU(u))
  }

  test("transposed swaps columns") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 20, 15, 100, seed = 4)
    val t = BipartiteDF.transposed(df)
    assert(BipartiteDF.wedgesEndpointsU(t) == g.wedgesEndpointsV)
  }

  test("generator: dataset configs produce graphs of the advertised shape") {
    for (cfg <- BipartiteGen.datasets) {
      val g = BipartiteGen.generate(cfg)
      assert(g.nU == cfg.nU && g.nV == cfg.nV)
      assert(g.m > cfg.targetM / 2, s"${cfg.name}: dedup removed too much (${g.m})")
      assert(g.m <= cfg.targetM)
    }
  }

  test("generator is deterministic in the seed") {
    val cfg = BipartiteGen.datasets.head
    val a = BipartiteGen.generate(cfg)
    val b = BipartiteGen.generate(cfg)
    assert(a.packedEdges.toSeq == b.packedEdges.toSeq)
  }

  test("U is the high-wedge side for every dataset (paper labelling)") {
    for (cfg <- BipartiteGen.datasets) {
      val g = BipartiteGen.generate(cfg)
      assert(g.wedgesEndpointsU > g.wedgesEndpointsV,
        s"${cfg.name}: ΛU=${g.wedgesEndpointsU} ΛV=${g.wedgesEndpointsV}")
    }
  }
}

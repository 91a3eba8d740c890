package repro.core

import org.apache.spark.sql.functions._
import repro.{BipartiteGen, Oracle, SparkSpec}
import repro.bipartite.{BipartiteGraph, ButterflyCounting}

class SparkButterflySpec extends SparkSpec {

  /** DuckDB formulation of per-vertex butterfly counts on the U side. */
  private val duckSql =
    """WITH e AS (SELECT CAST(u AS BIGINT) u, CAST(v AS BIGINT) v FROM edges),
      |p AS (SELECT e1.u u1, e2.u u2, COUNT(*) c
      |      FROM e e1 JOIN e e2 ON e1.v = e2.v AND e1.u < e2.u
      |      GROUP BY e1.u, e2.u HAVING COUNT(*) >= 2),
      |b AS (SELECT u1 AS u, c*(c-1)/2 AS bf FROM p
      |      UNION ALL
      |      SELECT u2 AS u, c*(c-1)/2 AS bf FROM p)
      |SELECT u, CAST(SUM(bf) AS BIGINT) AS cnt FROM b GROUP BY u
      |""".stripMargin

  private def uCountsDF(edges: org.apache.spark.sql.DataFrame) =
    SparkButterfly.countsDF(edges)
      .where(col("node") % 2 === 0)
      .select((col("node") / 2).cast("long") as "u", col("cnt").cast("long") as "cnt")

  test("priority dataflow counts match DuckDB oracle on random graphs") {
    for (seed <- 0 until 3) {
      val (_, df) = BipartiteGen.randomWithDF(spark, 30, 20, 150, seed)
      Oracle.assertEquivalent(uCountsDF(df), duckSql, "edges" -> df)
    }
  }

  test("priority dataflow counts match DuckDB oracle on a skewed graph") {
    val rnd = new java.util.Random(5)
    val es = (0 until 500).map(_ => (rnd.nextInt(60), if (rnd.nextDouble() < 0.7) rnd.nextInt(3) else rnd.nextInt(25)))
    val g = BipartiteGraph.fromEdges(60, 25, es)
    val df = BipartiteGen.edgesDF(spark, g)
    Oracle.assertEquivalent(uCountsDF(df), duckSql, "edges" -> df)
  }

  test("naive pair-join counts match DuckDB oracle") {
    val (_, df) = BipartiteGen.randomWithDF(spark, 25, 18, 120, seed = 9)
    Oracle.assertEquivalent(
      SparkButterfly.naiveCountsU(df).select(col("u"), col("cnt").cast("long") as "cnt"),
      duckSql, "edges" -> df)
  }

  for (seed <- 0 until 5)
    test(s"Spark counts equal the local vertex-priority kernel (seed=$seed)") {
      val (g, df) = BipartiteGen.randomWithDF(spark, 80 + 10 * seed, 60, 800, seed)
      val local = ButterflyCounting.vertexPriority(g)
      val distd = SparkButterfly.perVertex(spark, df, g.nU, g.nV)
      assert(distd.cntU.toSeq == local.cntU.toSeq, s"U seed=$seed")
      assert(distd.cntV.toSeq == local.cntV.toSeq, s"V seed=$seed")
    }

  test("K_{3,4}: closed-form per-vertex counts") {
    val g = BipartiteGraph.complete(3, 4)
    val r = SparkButterfly.perVertex(spark, BipartiteGen.edgesDF(spark, g), 3, 4)
    assert(r.cntU.forall(_ == 2L * 6), "U side: (a-1)*C(b,2) = 12")
    assert(r.cntV.forall(_ == 3L * 3), "V side: (b-1)*C(a,2) = 9")
    assert(r.totalButterflies == 18L)
  }

  test("butterfly-free graphs count to zero") {
    val star = BipartiteGraph.fromEdges(5, 1, (0 until 5).map(u => (u, 0)))
    val r = SparkButterfly.perVertex(spark, BipartiteGen.edgesDF(spark, star), 5, 1)
    assert(r.cntU.forall(_ == 0) && r.cntV.forall(_ == 0))
  }

  test("wedge-row metric respects the Chiba–Nishizeki bound") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 70, 50, 600, seed = 2)
    val r = SparkButterfly.perVertex(spark, df, g.nU, g.nV)
    assert(r.wedgeRows <= 2 * g.countCost)
    // The traversed wedge *sets* depend on the tie-break order among
    // equal-degree vertices (local ranks by CSR id, the dataflow by
    // combined id), so totals agree only to within the bound — the
    // counts themselves are checked exactly in the tests above.
    val local = ButterflyCounting.vertexPriority(g)
    assert(r.wedgeRows > 0 && local.wedges > 0)
  }

  test("counting a transposed edge set swaps the sides") {
    val (g, df) = BipartiteGen.randomWithDF(spark, 40, 30, 300, seed = 4)
    val r = SparkButterfly.perVertex(spark, df, g.nU, g.nV)
    val t = SparkButterfly.perVertex(spark, BipartiteDF.transposed(df), g.nV, g.nU)
    assert(t.cntU.toSeq == r.cntV.toSeq)
    assert(t.cntV.toSeq == r.cntU.toSeq)
  }
}

package repro.core

import repro.{Oracle, SparkSpec}
import repro.baselines.{JoinEnum, PathEnum}
import repro.data.GraphGen

/** Result-equality against DuckDB: a recursive CTE enumerates the ≤k-hop s-t
  * simple paths over the same edge table and derives the SPG edge set; every
  * SPG generator must match it row-for-row.
  */
class OracleSpec extends SparkSpec {

  private def checkEve(g: LocalGraph, s: Int, t: Int, k: Int): Unit = {
    val df = SpgOracle.spgDf(spark, Eve.spg(g, s, t, k).toSeq)
    Oracle.assertEquivalent(df, SpgOracle.sql(s, t, k), "edges" -> SpgOracle.edgesDf(spark, g))
  }

  for (k <- 3 to 7) {
    test(s"paper graph: EVE matches DuckDB (k=$k)") {
      import PaperGraph._
      checkEve(graph, s, t, k)
    }
  }

  for (seed <- 0 until 8) {
    test(s"random graph: EVE matches DuckDB (seed=$seed)") {
      val n = 12 + seed
      val g = GraphGen.uniform(n, 2 * n + seed, seed * 37 + 1)
      val s = seed % n; val t = (seed * 5 + 3) % n
      if (s != t) checkEve(g, s, t, 4 + seed % 4)
    }
  }

  test("empty answer matches DuckDB (unreachable pair)") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (2, 3)))
    checkEve(g, 0, 3, 5)
  }

  test("enumeration baselines match DuckDB too") {
    import PaperGraph._
    val k  = 6
    val e1 = SpgOracle.spgDf(spark, JoinEnum.spg(graph, s, t, k).toSeq)
    Oracle.assertEquivalent(e1, SpgOracle.sql(s, t, k), "edges" -> SpgOracle.edgesDf(spark, graph))
    val e2 = SpgOracle.spgDf(spark, PathEnum.spg(graph, s, t, k).toSeq)
    Oracle.assertEquivalent(e2, SpgOracle.sql(s, t, k), "edges" -> SpgOracle.edgesDf(spark, graph))
  }

  test("oracle catches a wrong result (sanity of the harness itself)") {
    import PaperGraph._
    val k = 4
    val wrong = Eve.spg(graph, s, t, k).toSeq :+ LocalGraph.enc(b, j) // b->j is not in SPG_4
    val df = SpgOracle.spgDf(spark, wrong)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, SpgOracle.sql(s, t, k), "edges" -> SpgOracle.edgesDf(spark, graph))
    }
  }
}

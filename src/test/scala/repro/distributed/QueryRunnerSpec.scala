package repro.distributed

import repro.SparkSpec
import repro.core.Eve
import repro.data.GraphGen

class QueryRunnerSpec extends SparkSpec {

  test("batch results match a sequential loop") {
    val g  = GraphGen.dataset("tw").build()
    val k  = 5
    val qs = GraphGen.queries(g, k, 8, seed = 77)
    val r  = QueryRunner.run(spark, g, qs, k, SpgAlgo.EveAlgo(), timeoutMs = 30000)
    assert(r.outcomes.size == qs.size)
    assert(r.timeouts == 0)
    val expected = qs.map { case (s, t) => Eve.spg(g, s, t, k).length }
    assert(r.outcomes.sortBy(o => (o.s, o.t)).map(_.edges) ==
      qs.zip(expected).map { case ((s, t), e) => (s, t, e) }.sortBy(x => (x._1, x._2)).map(_._3))
  }

  test("all algorithms agree on batch edge counts") {
    val g  = GraphGen.uniform(200, 800, 4)
    val k  = 5
    val qs = GraphGen.queries(g, k, 6, seed = 3)
    val algos = Seq(SpgAlgo.EveAlgo(), SpgAlgo.JoinAlgo, SpgAlgo.PathEnumAlgo, SpgAlgo.BcDfsAlgo)
    val results = algos.map(a => QueryRunner.run(spark, g, qs, k, a, timeoutMs = 30000))
    val counts = results.map(_.outcomes.sortBy(o => (o.s, o.t)).map(_.edges))
    assert(counts.forall(_ == counts.head),
      s"algorithms disagree: ${algos.map(_.name).zip(counts)}")
  }

  test("timeouts are reported, not thrown") {
    val g  = GraphGen.uniform(300, 4000, 8)
    val qs = GraphGen.queries(g, 8, 3, seed = 1)
    val r  = QueryRunner.run(spark, g, qs, 8, SpgAlgo.BcDfsAlgo, timeoutMs = 0)
    assert(r.timeouts == r.outcomes.count(_.edges == -1))
    assert(r.outcomes.size == 3)
  }

  test("totals aggregate per-query times") {
    val g  = GraphGen.dataset("tw").build()
    val qs = GraphGen.queries(g, 4, 5, seed = 11)
    val r  = QueryRunner.run(spark, g, qs, 4, SpgAlgo.EveAlgo(), timeoutMs = 30000)
    assert(r.totalNs == r.outcomes.map(_.timeNs).sum)
    assert(r.totalMs > 0)
    assert(!r.anyTimeout)
  }
}

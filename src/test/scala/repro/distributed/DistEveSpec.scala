package repro.distributed

import repro.{Oracle, SparkSpec}
import repro.baselines.BruteForce
import repro.core.{Eve, LocalGraph, PaperGraph, SpgOracle}
import repro.data.GraphGen

/** The GraphX dataflow must agree with the sequential EVE (and with DuckDB)
  * on every graph it is given.
  */
class DistEveSpec extends SparkSpec {

  private def distSpg(g: LocalGraph, s: Int, t: Int, k: Int): Set[(Long, Long)] = {
    val edges = SpgOracle.edgesDf(spark, g)
    DistEve.spg(spark, edges, s, t, k).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
  }

  private def localSpg(g: LocalGraph, s: Int, t: Int, k: Int): Set[(Long, Long)] =
    Eve.spg(g, s, t, k).map(e => (LocalGraph.src(e).toLong, LocalGraph.dst(e).toLong)).toSet

  for (k <- Seq(3, 4, 6, 7)) {
    test(s"paper graph: DistEve equals local EVE (k=$k)") {
      import PaperGraph._
      assert(distSpg(graph, s, t, k) == localSpg(graph, s, t, k))
    }
  }

  for (seed <- 0 until 6) {
    test(s"random graphs: DistEve equals local EVE (seed=$seed)") {
      val n = 20 + seed * 3
      val g = GraphGen.uniform(n, 3 * n, seed * 41 + 2)
      val s = seed % n; val t = (seed * 7 + 5) % n
      val k = 4 + seed % 4
      if (s != t) assert(distSpg(g, s, t, k) == localSpg(g, s, t, k), s"k=$k ($s,$t)")
    }
  }

  test("DistEve matches DuckDB on the paper graph") {
    import PaperGraph._
    val df = DistEve.spg(spark, SpgOracle.edgesDf(spark, graph), s, t, 6)
    Oracle.assertEquivalent(df, SpgOracle.sql(s, t, 6), "edges" -> SpgOracle.edgesDf(spark, graph))
  }

  test("DistEve on an unreachable pair returns an empty DataFrame") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (2, 3)))
    assert(DistEve.spg(spark, SpgOracle.edgesDf(spark, g), 0, 3, 5).count() == 0)
  }

  test("DistEve equals brute force on a power-law graph") {
    val g = GraphGen.powerLaw(30, 90, 0.9, 17)
    val s = 1; val t = 19; val k = 6
    val exp = BruteForce.spg(g, s, t, k)
      .map(e => (LocalGraph.src(e).toLong, LocalGraph.dst(e).toLong))
    assert(distSpg(g, s, t, k) == exp)
  }

  test("labelEdge (Long) mirrors the sequential labeler on the paper graph") {
    import PaperGraph._
    import repro.core.{Bfs, EdgeLabeling, EssentialVertices}
    val k     = 7
    val dists = Bfs.distances(graph, s, t, k, Bfs.SearchMode.Single)
    val evF   = EssentialVertices.propagate(graph, s, t, k, dists.fromAll, pruning = false)
    val evB   = EssentialVertices.propagate(graph.reverse, t, s, k, dists.toAll, pruning = false)
    def toL(layers: Array[Array[Int]]): Array[Array[Long]] =
      layers.map(l => if (l == null) null else l.map(_.toLong))
    for ((u, v) <- PaperGraph.edges) {
      val local = EdgeLabeling.labelEdge(k, s, t, u, v, evF, evB)
      val fL    = toL((0 until k).map(l => evF.at(l, u)).toArray)
      val bL    = toL((0 until k).map(l => evB.at(l, v)).toArray)
      val dist  = DistEve.labelEdge(k, s, t, u, v, fL, bL)
      assert(local == dist, s"edge ($u,$v)")
    }
  }
}

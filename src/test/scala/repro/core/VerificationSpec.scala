package repro.core

import repro.SparkSpec
import repro.baselines.BruteForce
import repro.data.GraphGen

/** End-to-end EVE vs brute force across seeds, k, densities, and every
  * configuration combination — the core correctness battery.
  */
class VerificationSpec extends SparkSpec {

  private val configs = Seq(
    "default"        -> EveConfig.Default,
    "naive"          -> EveConfig.Naive,
    "no-ordering"    -> EveConfig(ordering = false),
    "single-bfs"     -> EveConfig(search = Bfs.SearchMode.Single),
    "bidir-bfs"      -> EveConfig(search = Bfs.SearchMode.BiDir),
    "no-pruning"     -> EveConfig(pruning = false),
  )

  test("paper graph: verification removes e(b,a) from SPGu at k=7") {
    import PaperGraph._
    val r = Eve.run(graph, s, t, 7)
    assert(r.upperBound.edges.contains(LocalGraph.enc(b, a)))
    assert(!r.edges.contains(LocalGraph.enc(b, a)))
    assert(r.edges.toSet == BruteForce.spg(graph, s, t, 7))
  }

  test("paper graph: Example 5.7 — verifying e(i,j) also confirms e(j,h)") {
    import PaperGraph._
    val r     = Eve.run(graph, s, t, 7)
    val exact = BruteForce.spg(graph, s, t, 7)
    assert(exact.contains(LocalGraph.enc(i, j)) && exact.contains(LocalGraph.enc(j, h)))
    assert(r.edges.contains(LocalGraph.enc(i, j)) && r.edges.contains(LocalGraph.enc(j, h)))
  }

  test("paper graph: Figure 1(c) — SPG_4(s,t)") {
    import PaperGraph._
    val r = Eve.run(graph, s, t, 4)
    assert(r.edgePairs.toSet == spg4)
  }

  for ((cfgName, cfg) <- configs; seed <- 0 until 10; k <- Seq(3, 5, 6, 7)) {
    test(s"EVE($cfgName) == brute force (seed=$seed k=$k)") {
      val n = 12 + seed % 5
      val g = GraphGen.uniform(n, (2.5 * n).toInt + seed * 2, seed * 101 + k)
      val s = seed % n; val t = (seed * 3 + 2) % n
      if (s != t) {
        val got = Eve.spg(g, s, t, k, cfg).toSet
        val exp = BruteForce.spg(g, s, t, k)
        assert(got == exp,
          s"missing=${exp.diff(got).map(e => (LocalGraph.src(e), LocalGraph.dst(e)))} " +
          s"extra=${got.diff(exp).map(e => (LocalGraph.src(e), LocalGraph.dst(e)))}")
      }
    }
  }

  for (seed <- 0 until 12; k <- Seq(5, 6, 8)) {
    test(s"EVE == brute force on power-law graphs (seed=$seed k=$k)") {
      val g = GraphGen.powerLaw(20, 55, 0.9, seed * 7 + k)
      val s = seed % g.n; val t = (seed * 11 + 4) % g.n
      if (s != t) {
        assert(Eve.spg(g, s, t, k).toSet == BruteForce.spg(g, s, t, k))
      }
    }
  }

  for (seed <- 0 until 8) {
    test(s"EVE == brute force on dense graphs, k=5 boundary case (seed=$seed)") {
      // k=5 is the smallest k with verification; q* has length exactly 1.
      val g = GraphGen.uniform(10, 40, seed * 5 + 3)
      val s = seed % g.n; val t = (seed + 3) % g.n
      if (s != t) {
        assert(Eve.spg(g, s, t, 5).toSet == BruteForce.spg(g, s, t, 5))
      }
    }
  }

  test("all configurations produce identical SPG edges") {
    val g = GraphGen.uniform(18, 50, 99)
    for (k <- 3 to 8; (s, t) <- Seq((0, 5), (3, 17), (10, 2))) {
      val results = configs.map { case (name, cfg) => name -> Eve.spg(g, s, t, k, cfg).toSeq }
      val expected = results.head._2
      for ((name, r) <- results.tail)
        assert(r == expected, s"config $name diverges at k=$k ($s,$t)")
    }
  }

  test("deadline aborts verification with DeadlineExceeded") {
    val g = GraphGen.uniform(60, 600, 7)
    intercept[DeadlineExceeded] {
      // An already-expired deadline must abort before completing.
      Eve.run(g, 0, 1, 8, EveConfig.Default, deadline = System.nanoTime() - 1)
    }
  }
}

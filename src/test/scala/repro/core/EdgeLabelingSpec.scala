package repro.core

import repro.SparkSpec
import repro.baselines.BruteForce
import repro.data.GraphGen

class EdgeLabelingSpec extends SparkSpec {

  private def labelAll(g: LocalGraph, s: Int, t: Int, k: Int): UpperBoundGraph = {
    val dists = Bfs.distances(g, s, t, k, Bfs.SearchMode.Adaptive)
    val evF   = EssentialVertices.propagate(g, s, t, k, dists.fromAll, pruning = true)
    val evB   = EssentialVertices.propagate(g.reverse, t, s, k, dists.toAll, pruning = true)
    EdgeLabeling.upperBound(g, s, t, k, dists, evF, evB)
  }

  // --- paper worked examples, k = 7 ---

  {
    import PaperGraph._
    val k = 7
    lazy val ub = labelAll(graph, s, t, k)
    lazy val labelOf: Map[(Int, Int), Byte] =
      ub.edges.zip(ub.labels).map { case (e, l) => ((LocalGraph.src(e), LocalGraph.dst(e)), l) }.toMap

    test("Example 4.2: e(i,j) is in the upper-bound graph") {
      assert(labelOf.contains((i, j)))
    }
    test("Example 4.2: e(b,j) is a failing edge") {
      assert(!labelOf.contains((b, j)))
    }
    test("Example 4.5: e(s,a) is definite") {
      assert(labelOf((s, a)) == EdgeLabel.Definite)
    }
    test("Example 4.7: e(a,i) is definite") {
      assert(labelOf((a, i)) == EdgeLabel.Definite)
    }
    test("Lemma 3.3 counterexample: e(b,a) survives as undetermined") {
      assert(labelOf((b, a)) == EdgeLabel.Undetermined)
    }
    test("first/last-hop edges of SPGu are definite (Lemma 4.4)") {
      for (((u, v), l) <- labelOf if u == s || v == t) assert(l == EdgeLabel.Definite, s"($u,$v)")
    }

    test("Example 5.5: departures/arrivals of the paper graph") {
      val bd = Boundary.compute(ub)
      assert(bd.departures.toSet == Set(b, c, h, i))
      assert(bd.arrivals.toSet == Set(a, c, h))
      assert(bd.inD(c).toSet == Set(a))
      assert(bd.outA(c).toSet == Set(b))
      assert(bd.inD(i).toSet == Set(a))
      assert(bd.outA(h).toSet == Set(b))
    }
  }

  // --- structural properties vs brute force on random graphs ---

  for (seed <- 0 until 15; k <- Seq(3, 4, 5, 6, 7)) {
    test(s"SPGu contains SPG; definite edges are in SPG (seed=$seed k=$k)") {
      val n = 12 + seed % 4
      val g = GraphGen.uniform(n, (2.2 * n).toInt + seed, seed * 31 + k)
      val s = seed % n; val t = (seed * 7 + 1) % n
      if (s != t) {
        val ub    = labelAll(g, s, t, k)
        val exact = BruteForce.spg(g, s, t, k)
        val ubSet = ub.edges.toSet
        assert(exact.subsetOf(ubSet), s"upper bound lost ${exact.diff(ubSet).size} true edges")
        ub.definiteEdges.foreach(e => assert(exact.contains(e),
          s"definite edge (${LocalGraph.src(e)},${LocalGraph.dst(e)}) not in SPG"))
      }
    }
  }

  for (seed <- 0 until 10; k <- Seq(1, 2, 3, 4)) {
    test(s"Theorem 4.8: SPGu equals SPG exactly for k<=4 (seed=$seed k=$k)") {
      val n = 10 + seed % 6
      val g = GraphGen.uniform(n, 3 * n, seed * 17 + k)
      val s = seed % n; val t = (seed + 5) % n
      if (s != t) {
        val ub    = labelAll(g, s, t, k)
        val exact = BruteForce.spg(g, s, t, k)
        assert(ub.edges.toSet == exact)
        assert(ub.labels.forall(_ == EdgeLabel.Definite), "k<=4 admits no undetermined edges")
      }
    }
  }

  for (seed <- 0 until 8) {
    test(s"Theorem 4.9: first/last two hops of any simple path are definite (seed=$seed)") {
      val n = 12
      val g = GraphGen.uniform(n, 30 + seed, seed * 3 + 11)
      val s = seed % n; val t = (seed + 7) % n
      val k = 6
      if (s != t) {
        val ub = labelAll(g, s, t, k)
        val lab = ub.edges.zip(ub.labels).map { case (e, l) => (e, l) }.toMap
        for (p <- BruteForce.allSimplePaths(g, s, t, k)) {
          val es = p.sliding(2).map(q => LocalGraph.enc(q.head, q(1))).toSeq
          for (e <- Seq(es.head, es.last) ++ es.slice(1, 2) ++ es.dropRight(1).takeRight(1))
            assert(lab(e) == EdgeLabel.Definite,
              s"edge (${LocalGraph.src(e)},${LocalGraph.dst(e)}) of path $p")
        }
      }
    }
  }

  test("direct edge e(s,t) is definite for any k") {
    val g = LocalGraph.fromEdges(3, Seq((0, 2), (0, 1), (1, 2)))
    for (k <- 1 to 5) {
      val ub = labelAll(g, 0, 2, k)
      val m  = ub.edges.zip(ub.labels).toMap
      assert(m(LocalGraph.enc(0, 2)) == EdgeLabel.Definite, s"k=$k")
    }
  }

  test("k=1: only the direct edge survives") {
    val g  = LocalGraph.fromEdges(3, Seq((0, 2), (0, 1), (1, 2)))
    val ub = labelAll(g, 0, 2, 1)
    assert(ub.edges.toSeq == Seq(LocalGraph.enc(0, 2)))
  }

  test("edges into s and out of t are always failing") {
    val g  = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3), (3, 0), (2, 0), (3, 1)))
    val ub = labelAll(g, 0, 2, 4)
    val set = ub.edges.toSet
    assert(!set.contains(LocalGraph.enc(2, 3)), "edge out of t kept")
    assert(!set.contains(LocalGraph.enc(3, 0)), "edge into s kept")
    assert(!set.contains(LocalGraph.enc(2, 0)), "edge t->s kept")
  }

  test("In_D/Out_A are capped at k-2 entries (Theorem 5.8)") {
    // star into departure vertex 1: s->x_i->1 for many x_i, then 1->2->t
    val k = 6
    val spokes = (3 until 12)
    val edges = spokes.flatMap(x => Seq((0, x), (x, 1))) ++ Seq((1, 2), (2, 13), (12, 13))
    val g = LocalGraph.fromEdges(14, edges)
    val ub = labelAll(g, 0, 13, k)
    val bd = Boundary.compute(ub)
    assert(bd.isDeparture(1))
    assert(bd.inD(1).length <= k - 2)
  }
}

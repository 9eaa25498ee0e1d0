package repro.core

/** Configuration switches matching the Fig. 11 ablation.
  *
  * @param pruning  forward-looking pruning (§3.3, Theorem 3.6)
  * @param search   distance computation strategy (§3.3)
  * @param ordering search ordering strategies for verification (§5.3)
  */
final case class EveConfig(
    pruning: Boolean = true,
    search: Bfs.SearchMode = Bfs.SearchMode.Adaptive,
    ordering: Boolean = true,
) extends Serializable

object EveConfig {
  val Default: EveConfig = EveConfig()
  /** "Naive EVE" in Fig. 11: all pruning techniques disabled. */
  val Naive: EveConfig = EveConfig(pruning = false, search = Bfs.SearchMode.Single, ordering = false)
}

/** Per-phase wall times (ns) and size counters for §6.4-style breakdowns. */
final case class EveStats(
    distNs: Long,
    propagateNs: Long,
    labelNs: Long,
    verifyNs: Long,
    upperEdges: Int,
    definiteEdges: Int,
    undeterminedEdges: Int,
    resultEdges: Int,
) {
  def totalNs: Long = distNs + propagateNs + labelNs + verifyNs
}

/** Result of an EVE run: the exact SPG_k(s,t) edge set, the upper bound it
  * was refined from, and phase statistics.
  */
final case class EveResult(
    /** Exact SPG_k(s,t) edges, encoded (sorted for determinism). */
    edges: Array[Long],
    /** The upper-bound graph SPGu_k(s,t). */
    upperBound: UpperBoundGraph,
    stats: EveStats,
) {
  def edgePairs: Array[(Int, Int)] = edges.map(e => (LocalGraph.src(e), LocalGraph.dst(e)))
  /** Vertices of SPG_k (endpoints of its edges). */
  def vertices: Set[Int] = edges.iterator.flatMap(e => Iterator(LocalGraph.src(e), LocalGraph.dst(e))).toSet
}

/** EVE — Essential Vertices based Examination (the paper's contribution).
  *
  * Three phases (§2.3): (1) adaptive bi-directional distances + essential
  * vertex propagation, (2) edge labeling producing the upper-bound graph,
  * (3) verification of undetermined edges. For k ≤ 4 the upper bound is
  * exact (Theorem 4.8) and phase (3) is skipped.
  */
object Eve {

  def run(
      g: LocalGraph,
      s: Int,
      t: Int,
      k: Int,
      config: EveConfig = EveConfig.Default,
      deadline: Long = Deadline.None,
  ): EveResult = {
    require(s != t, "query requires s != t")
    require(k >= 1, "hop constraint must be >= 1")

    val t0    = System.nanoTime()
    val dists = Bfs.distances(g, s, t, k, config.search)
    val t1    = System.nanoTime()

    // Unreachable within k hops: empty answer, skip the heavy phases.
    if (dists.fromS(t) > k) {
      val empty = new UpperBoundGraph(g.n, k, s, t, Array.emptyLongArray, Array.emptyByteArray)
      return EveResult(Array.emptyLongArray, empty,
        EveStats(t1 - t0, 0, 0, 0, 0, 0, 0, 0))
    }

    Deadline.check(deadline)
    val evF = EssentialVertices.propagate(g, s, t, k, dists.fromAll, config.pruning)
    Deadline.check(deadline)
    val evB = EssentialVertices.propagate(g.reverse, t, s, k, dists.toAll, config.pruning)
    val t2  = System.nanoTime()

    Deadline.check(deadline)
    val ub = EdgeLabeling.upperBound(g, s, t, k, dists, evF, evB)
    val t3 = System.nanoTime()

    val resultSet: java.util.HashSet[java.lang.Long] =
      if (k <= 4) {
        // Theorem 4.8: SPGu = SPG, no verification needed.
        val set = new java.util.HashSet[java.lang.Long]()
        ub.edges.foreach(e => set.add(e))
        set
      } else {
        val boundary = Boundary.compute(ub)
        new Verifier(ub, boundary, config.ordering, deadline).verify()
      }
    val t4 = System.nanoTime()

    val edges = new Array[Long](resultSet.size())
    val it    = resultSet.iterator()
    var i     = 0
    while (it.hasNext) { edges(i) = it.next(); i += 1 }
    java.util.Arrays.sort(edges)

    val definite = ub.labels.count(_ == EdgeLabel.Definite)
    EveResult(
      edges,
      ub,
      EveStats(
        distNs = t1 - t0,
        propagateNs = t2 - t1,
        labelNs = t3 - t2,
        verifyNs = t4 - t3,
        upperEdges = ub.numEdges,
        definiteEdges = definite,
        undeterminedEdges = ub.numEdges - definite,
        resultEdges = edges.length,
      ),
    )
  }

  /** Convenience: just the exact SPG_k edge set. */
  def spg(g: LocalGraph, s: Int, t: Int, k: Int,
          config: EveConfig = EveConfig.Default,
          deadline: Long = Deadline.None): Array[Long] =
    run(g, s, t, k, config, deadline).edges
}

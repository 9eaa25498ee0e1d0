package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Edge labels of §4: 0 = failing, 1 = undetermined, 2 = definite. */
object EdgeLabel {
  val Failing: Byte      = 0
  val Undetermined: Byte = 1
  val Definite: Byte     = 2
}

/** The upper-bound graph SPGu_k(s,t) (Definition 4.1) with per-edge labels,
  * plus the adjacency needed by verification.
  */
final class UpperBoundGraph(
    val n: Int,
    val k: Int,
    val s: Int,
    val t: Int,
    /** Encoded edges with label ≥ 1 (see [[LocalGraph.enc]]). */
    val edges: Array[Long],
    /** Parallel to [[edges]]: 1 or 2. */
    val labels: Array[Byte],
) extends Serializable {

  def numEdges: Int = edges.length
  def definiteEdges: Iterator[Long] =
    edges.iterator.zip(labels.iterator).collect { case (e, l) if l == EdgeLabel.Definite => e }
  def undeterminedEdges: Iterator[Long] =
    edges.iterator.zip(labels.iterator).collect { case (e, l) if l == EdgeLabel.Undetermined => e }

  /** Out-adjacency restricted to SPGu edges. */
  lazy val outU: Array[Array[Int]] = UpperBoundGraph.adj(n, edges, forward = true)
  /** In-adjacency restricted to SPGu edges. */
  lazy val inU: Array[Array[Int]] = UpperBoundGraph.adj(n, edges, forward = false)

  lazy val edgeSet: java.util.HashSet[java.lang.Long] = {
    val set = new java.util.HashSet[java.lang.Long](edges.length * 2)
    edges.foreach(e => set.add(e))
    set
  }
  def containsEdge(u: Int, v: Int): Boolean = edgeSet.contains(LocalGraph.enc(u, v))
}

object UpperBoundGraph {
  private def adj(n: Int, edges: Array[Long], forward: Boolean): Array[Array[Int]] = {
    val enc =
      if (forward) edges.clone()
      else edges.map(e => LocalGraph.enc(LocalGraph.dst(e), LocalGraph.src(e)))
    java.util.Arrays.sort(enc)
    LocalGraph.grouped(n, enc)
  }
}

/** Algorithm 2 — per-edge labeling against the essential-vertex indexes. */
object EdgeLabeling {

  /** Label a single edge e(u,v). `evF` is the forward index (from s), `evB`
    * the backward index (to t). Follows Algorithm 2 line-by-line; see the
    * paper's Lemmas 4.4/4.6 and Theorem 4.3 for why checking kb = k-kf-1
    * covers all smaller kb.
    */
  def labelEdge(k: Int, s: Int, t: Int, u: Int, v: Int, evF: EvIndex, evB: EvIndex): Byte = {
    // line 1: first-hop from s / last-hop into t (Lemma 4.4, an iff).
    if (u == s) return if (evB.exists(k - 1, v)) EdgeLabel.Definite else EdgeLabel.Failing
    if (v == t) return if (evF.exists(k - 1, u)) EdgeLabel.Definite else EdgeLabel.Failing
    if (k >= 2) {
      // line 3: second-hop from s (Lemma 4.6).
      if (evF.exists(1, u)) {
        val b2 = evB.at(k - 2, v)
        if (b2 != null && !VSet.contains(b2, u)) return EdgeLabel.Definite
      }
      // line 4: second-hop into t (symmetric).
      if (evB.exists(1, v)) {
        val f2 = evF.at(k - 2, u)
        if (f2 != null && !VSet.contains(f2, v)) return EdgeLabel.Definite
      }
    }
    // lines 5-8: remaining (kf, kb) pairs with kf+kb+1 = k (Theorem 4.3).
    var kf = 2
    while (kf <= k - 3) {
      val a = evF.at(kf, u)
      if (a != null) {
        val b = evB.at(k - kf - 1, v)
        if (b != null && VSet.disjoint(a, b)) return EdgeLabel.Undetermined
      }
      kf += 1
    }
    EdgeLabel.Failing
  }

  /** Label every edge inside the bi-directional search space and assemble the
    * upper-bound graph. Edges with Δ(s,u)+1+Δ(v,t) > k are failing without
    * inspection (they violate the length constraint outright).
    */
  def upperBound(
      g: LocalGraph,
      s: Int,
      t: Int,
      k: Int,
      dists: Bfs.Dists,
      evF: EvIndex,
      evB: EvIndex,
  ): UpperBoundGraph = {
    val edges  = new ArrayBuffer[Long]()
    val labels = new ArrayBuffer[Byte]()
    var u = 0
    while (u < g.n) {
      val du = dists.fromS(u)
      if (du < k) {
        val outs = g.outAdj(u)
        var j = 0
        while (j < outs.length) {
          val v = outs(j)
          if (dists.toT(v) <= k - 1 - du) {
            val lab = labelEdge(k, s, t, u, v, evF, evB)
            if (lab != EdgeLabel.Failing) {
              edges += LocalGraph.enc(u, v)
              labels += lab
            }
          }
          j += 1
        }
      }
      u += 1
    }
    new UpperBoundGraph(g.n, k, s, t, edges.toArray, labels.toArray)
  }
}

/** Departures, arrivals and their valid neighbors (Definitions 5.1–5.4).
  *
  * Computed by a dedicated pass over SPGu implementing the definitions
  * directly (see DESIGN.md §6). In_D / Out_A are capped at k-2 entries per
  * Theorem 5.8.
  */
final class Boundary(
    val isDeparture: Array[Boolean],
    val isArrival: Array[Boolean],
    /** Valid in-neighbors per departure vertex (≤ k-2 entries), null elsewhere. */
    val inD: Array[Array[Int]],
    /** Valid out-neighbors per arrival vertex (≤ k-2 entries), null elsewhere. */
    val outA: Array[Array[Int]],
) extends Serializable {
  def departures: Seq[Int] = isDeparture.indices.filter(isDeparture)
  def arrivals: Seq[Int]   = isArrival.indices.filter(isArrival)
}

object Boundary {

  def compute(ub: UpperBoundGraph): Boundary = {
    val n   = ub.n
    val cap = math.max(1, ub.k - 2)
    val isD = new Array[Boolean](n)
    val isA = new Array[Boolean](n)
    val inD  = new Array[ArrayBuffer[Int]](n)
    val outA = new Array[ArrayBuffer[Int]](n)

    // Definition 5.1: v ∈ D iff ∃ in-neighbor x with x,v,s,t distinct and
    // e(s,x), e(x,v) ∈ SPGu.
    for (x <- ub.outU(ub.s) if x != ub.t) {        // e(s,x) ∈ SPGu, x ≠ s by no-self-loop
      for (v <- ub.outU(x) if v != ub.s && v != ub.t && v != x) {
        isD(v) = true
        if (inD(v) == null) inD(v) = new ArrayBuffer[Int]()
        if (inD(v).length < cap && !inD(v).contains(x)) inD(v) += x
      }
    }
    // Definition 5.3: v ∈ A iff ∃ out-neighbor y with v,y,s,t distinct and
    // e(v,y), e(y,t) ∈ SPGu.
    for (y <- ub.inU(ub.t) if y != ub.s) {         // e(y,t) ∈ SPGu
      for (v <- ub.inU(y) if v != ub.s && v != ub.t && v != y) {
        isA(v) = true
        if (outA(v) == null) outA(v) = new ArrayBuffer[Int]()
        if (outA(v).length < cap && !outA(v).contains(y)) outA(v) += y
      }
    }
    new Boundary(isD, isA, inD.map(b => if (b == null) null else b.toArray),
      outA.map(b => if (b == null) null else b.toArray))
  }
}

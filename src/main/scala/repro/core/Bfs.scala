package repro.core

import scala.collection.mutable.ArrayBuffer

/** Bounded shortest-distance computation (§3.3 of the paper).
  *
  * EVE needs Δ(s,y) and Δ(y,t) for exactly the vertices y that can lie on a
  * k-bounded s-t path, i.e. those with Δ(s,y)+Δ(y,t) ≤ k; every other vertex
  * may keep distance +∞. Three strategies are implemented, matching the
  * ablation of Figure 11:
  *
  *  - [[SearchMode.Single]]      — two full k-bounded BFS (from s over G and
  *                                 from t over G^r), the KHSQ strategy;
  *  - [[SearchMode.BiDir]]       — bi-directional BFS with equal depths
  *                                 ⌈k/2⌉/⌊k/2⌋, then each side continues for
  *                                 the remaining steps restricted to vertices
  *                                 the opposite side explored;
  *  - [[SearchMode.Adaptive]]    — same, but each step advances whichever
  *                                 frontier is currently smaller (Adaptive
  *                                 Bi-directional Search [2,21]).
  *
  * All three return exact Δ(s,y) and Δ(y,t) for every y with
  * Δ(s,y)+Δ(y,t) ≤ k (property-tested), encoded as Int arrays with
  * [[Bfs.Inf]] for "unknown / > k".
  */
object Bfs {

  /** Sentinel for "distance unknown or larger than the bound". Chosen so that
    * `d1 + d2` never overflows Int for d1,d2 ≤ Inf.
    */
  val Inf: Int = Int.MaxValue / 4

  sealed trait SearchMode extends Serializable
  object SearchMode {
    case object Single   extends SearchMode
    case object BiDir    extends SearchMode
    case object Adaptive extends SearchMode
  }

  /** Distances from s (forward) and to t (backward), per the chosen mode. */
  final case class Dists(toAll: Array[Int], fromAll: Array[Int]) {
    /** Δ(s,y). */ def fromS(y: Int): Int = toAll(y)
    /** Δ(y,t). */ def toT(y: Int): Int   = fromAll(y)
  }

  /** Plain k-bounded BFS over the given adjacency from `root`. */
  def bounded(adj: Array[Array[Int]], n: Int, root: Int, k: Int): Array[Int] = {
    val dist = Array.fill(n)(Inf)
    dist(root) = 0
    var frontier = ArrayBuffer(root)
    var d = 0
    while (d < k && frontier.nonEmpty) {
      val next = new ArrayBuffer[Int]()
      var i = 0
      while (i < frontier.length) {
        val x = frontier(i); val a = adj(x); var j = 0
        while (j < a.length) {
          val y = a(j)
          if (dist(y) == Inf) { dist(y) = d + 1; next += y }
          j += 1
        }
        i += 1
      }
      frontier = next
      d += 1
    }
    dist
  }

  /** Compute Δ(s,·) and Δ(·,t) bounded by k with the requested strategy. */
  def distances(g: LocalGraph, s: Int, t: Int, k: Int, mode: SearchMode): Dists =
    mode match {
      case SearchMode.Single =>
        Dists(bounded(g.outAdj, g.n, s, k), bounded(g.inAdj, g.n, t, k))
      case SearchMode.BiDir    => bidirectional(g, s, t, k, adaptive = false)
      case SearchMode.Adaptive => bidirectional(g, s, t, k, adaptive = true)
    }

  /** Bi-directional phase 1 (total depth k split between the two sides),
    * then restricted continuations (see the class doc for the guarantee).
    */
  private def bidirectional(g: LocalGraph, s: Int, t: Int, k: Int, adaptive: Boolean): Dists = {
    val n  = g.n
    val dF = Array.fill(n)(Inf); dF(s) = 0
    val dB = Array.fill(n)(Inf); dB(t) = 0
    var fF = ArrayBuffer(s)
    var fB = ArrayBuffer(t)
    var depthF = 0
    var depthB = 0

    def stepF(restrictToB: Boolean): Unit = {
      val next = new ArrayBuffer[Int]()
      var i = 0
      while (i < fF.length) {
        val a = g.outAdj(fF(i)); var j = 0
        while (j < a.length) {
          val y = a(j)
          if (dF(y) == Inf && (!restrictToB || dB(y) != Inf)) { dF(y) = depthF + 1; next += y }
          j += 1
        }
        i += 1
      }
      fF = next; depthF += 1
    }
    def stepB(restrictToF: Boolean): Unit = {
      val next = new ArrayBuffer[Int]()
      var i = 0
      while (i < fB.length) {
        val a = g.inAdj(fB(i)); var j = 0
        while (j < a.length) {
          val y = a(j)
          if (dB(y) == Inf && (!restrictToF || dF(y) != Inf)) { dB(y) = depthB + 1; next += y }
          j += 1
        }
        i += 1
      }
      fB = next; depthB += 1
    }

    // Phase 1: split the total depth budget k between the two sides.
    while (depthF + depthB < k && (fF.nonEmpty || fB.nonEmpty)) {
      val forward =
        if (fF.isEmpty) false
        else if (fB.isEmpty) true
        else if (adaptive) fF.length <= fB.length
        else depthF <= depthB // strict alternation, forward first (⌈k/2⌉ / ⌊k/2⌋)
      if (forward) stepF(restrictToB = false) else stepB(restrictToF = false)
    }
    // Snapshot which vertices each phase-1 side has seen: the continuations
    // below must restrict to the *opposite phase-1* exploration, so run the
    // forward continuation against a frozen view of dB and vice versa.
    val dBPhase1 = dB.clone()
    val dFPhase1 = dF.clone()
    val fBPhase1 = fB

    // Phase 2a: forward continuation for the remaining steps, over vertices
    // explored backward in phase 1.
    while (depthF < k && fF.nonEmpty) {
      val next = new ArrayBuffer[Int]()
      var i = 0
      while (i < fF.length) {
        val a = g.outAdj(fF(i)); var j = 0
        while (j < a.length) {
          val y = a(j)
          if (dF(y) == Inf && dBPhase1(y) != Inf) { dF(y) = depthF + 1; next += y }
          j += 1
        }
        i += 1
      }
      fF = next; depthF += 1
    }
    // Phase 2b: backward continuation over vertices explored forward in phase 1.
    fB = fBPhase1
    while (depthB < k && fB.nonEmpty) {
      val next = new ArrayBuffer[Int]()
      var i = 0
      while (i < fB.length) {
        val a = g.inAdj(fB(i)); var j = 0
        while (j < a.length) {
          val y = a(j)
          if (dB(y) == Inf && dFPhase1(y) != Inf) { dB(y) = depthB + 1; next += y }
          j += 1
        }
        i += 1
      }
      fB = next; depthB += 1
    }
    Dists(dF, dB)
  }
}

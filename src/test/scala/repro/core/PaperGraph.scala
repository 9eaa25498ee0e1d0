package repro.core

/** The running example of the paper — graph G of Figure 1(a), reconstructed
  * from the published evidence:
  *  - Example 3.2 (P*_2(s,b), P*_3(s,b)),
  *  - the EV tables of Figure 5(a)/(b),
  *  - Example 4.2 (edges e(i,j), e(b,j)), Lemma 3.3's counterexample e(b,a),
  *  - Examples 4.5/4.7/5.5/5.7 (definite edges, departures/arrivals).
  * Every table entry asserted in the suites below is checked against this
  * edge set, so an inconsistent reconstruction would fail loudly.
  */
object PaperGraph {
  val s = 0; val a = 1; val b = 2; val c = 3; val h = 4; val i = 5; val j = 6; val t = 7
  val names: Map[Int, String] =
    Map(s -> "s", a -> "a", b -> "b", c -> "c", h -> "h", i -> "i", j -> "j", t -> "t")

  val edges: Seq[(Int, Int)] = Seq(
    (s, a), (s, c),
    (a, c), (a, h), (a, i),
    (b, t), (b, a), (b, j),
    (c, b), (c, t),
    (h, b), (h, i),
    (i, j),
    (j, h),
  )

  val graph: LocalGraph = LocalGraph.fromEdges(8, edges)

  /** Figure 5(a): EV*_l(s, ·) for l = 1..6 (null = does not exist). Values
    * in parentheses in the figure (skipped under pruning at k=7) are included
    * here at their unpruned values; pruning equivalence is tested separately.
    */
  val evForward: Map[Int, Map[Int, Set[Int]]] = Map(
    1 -> Map(a -> Set(s, a), c -> Set(s, c)),
    2 -> Map(a -> Set(s, a), b -> Set(s, c, b), c -> Set(s, c), h -> Set(s, a, h), i -> Set(s, a, i)),
    3 -> Map(a -> Set(s, a), b -> Set(s, b), c -> Set(s, c), h -> Set(s, a, h), i -> Set(s, a, i), j -> Set(s, j)),
    4 -> Map(a -> Set(s, a), b -> Set(s, b), c -> Set(s, c), h -> Set(s, h), i -> Set(s, a, i), j -> Set(s, j)),
    5 -> Map(a -> Set(s, a), b -> Set(s, b), c -> Set(s, c), h -> Set(s, h), i -> Set(s, i), j -> Set(s, j)),
    6 -> Map(a -> Set(s, a), b -> Set(s, b), c -> Set(s, c), h -> Set(s, h), i -> Set(s, i), j -> Set(s, j)),
  )

  /** Figure 5(b): EV*_l(·, t) for l = 1..6. */
  val evBackward: Map[Int, Map[Int, Set[Int]]] = Map(
    1 -> Map(b -> Set(b, t), c -> Set(c, t)),
    2 -> Map(a -> Set(a, c, t), b -> Set(b, t), c -> Set(c, t), h -> Set(h, b, t)),
    3 -> Map(a -> Set(a, t), b -> Set(b, t), c -> Set(c, t), h -> Set(h, b, t), j -> Set(j, h, b, t)),
    4 -> Map(a -> Set(a, t), b -> Set(b, t), c -> Set(c, t), h -> Set(h, b, t), i -> Set(i, j, h, b, t), j -> Set(j, h, b, t)),
    5 -> Map(a -> Set(a, t), b -> Set(b, t), c -> Set(c, t), h -> Set(h, b, t), i -> Set(i, j, h, b, t), j -> Set(j, h, b, t)),
    6 -> Map(a -> Set(a, t), b -> Set(b, t), c -> Set(c, t), h -> Set(h, b, t), i -> Set(i, j, h, b, t), j -> Set(j, h, b, t)),
  )

  /** Figure 1(c): SPG_4(s,t) — the five ≤4-hop s-t simple paths' edges. */
  val spg4: Set[(Int, Int)] =
    Set((s, c), (c, t), (s, a), (a, c), (c, b), (b, t), (a, h), (h, b))
}

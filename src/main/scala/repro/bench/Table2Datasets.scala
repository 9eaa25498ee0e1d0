package repro.bench

import repro.data.GraphGen

/** Table 2 — networks for experiments. Prints the mini-scale stand-ins next
  * to the originals they substitute (DESIGN.md §3).
  */
object Table2Datasets {

  def run(): String = {
    val rows = GraphGen.datasets.map { spec =>
      val g = spec.build()
      Seq(
        spec.name,
        spec.original,
        spec.domain,
        g.n.toString,
        g.m.toString,
        f"${g.avgDeg}%.1f",
        spec.paperV,
        spec.paperE,
        spec.paperDavg.toString,
      )
    }
    "## Table 2 — datasets (mini-scale stand-ins vs paper originals)\n\n" +
      BenchUtil.markdown(
        Seq("name", "original", "type", "|V| (ours)", "|E| (ours)", "d_avg (ours)",
            "|V| (paper)", "|E| (paper)", "d_avg (paper)"),
        rows,
      )
  }
}

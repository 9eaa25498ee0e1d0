package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.{Deadline, DeadlineExceeded, Eve, EveConfig}
import repro.data.GraphGen

/** Table 3 — average redundant ratio r_D of the upper-bound graph,
  * r_D = (|E(SPGu)| − |E(SPG)|) / |E(SPG)|, averaged over the query batch
  * for k ∈ {5,6,7,8}. The paper's claim to check: SPGu is extremely tight
  * (< 0.05% redundant edges for most graphs).
  */
object Table3Redundant {

  def ks: Seq[Int] = Seq(5, 6, 7, 8)

  def run(spark: SparkSession): String = {
    val nQ = BenchUtil.queriesPerPoint
    val sc = spark.sparkContext

    val rows = GraphGen.datasets.map { spec =>
      val g   = spec.build()
      val bcG = sc.broadcast(g)
      val timeout = math.max(BenchUtil.timeoutMs, 5000L)
      val cells = ks.map { k =>
        val queries = GraphGen.queries(g, k, nQ, seed = 3000L + k)
        val ratios = sc
          .parallelize(queries, math.min(queries.size, sc.defaultParallelism))
          .map { case (s, t) =>
            try {
              val r = Eve.run(bcG.value, s, t, k, EveConfig.Default, Deadline.in(timeout))
              if (r.edges.isEmpty) Some(0.0)
              else Some((r.stats.upperEdges - r.edges.length).toDouble / r.edges.length)
            } catch { case _: DeadlineExceeded => None }
          }
          .collect()
        val ok = ratios.flatten
        // The paper marks points its harness could not finish with "-".
        if (ok.length < ratios.length / 2.0) "-"
        else {
          val avg = ok.sum / ok.length
          if (avg == 0.0) "0" else f"${avg * 100}%.4f%%"
        }
      }
      bcG.destroy()
      Seq(spec.name) ++ cells
    }

    s"## Table 3 — average redundant ratio r_D over $nQ queries\n\n" +
      BenchUtil.markdown(Seq("graph") ++ ks.map(k => s"k=$k"), rows)
  }
}

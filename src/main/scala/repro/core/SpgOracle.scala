package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** DuckDB-side reference query for SPG_k(s,t), used with
  * [[repro.Oracle.assertEquivalent]].
  *
  * A recursive CTE enumerates every ≤k-hop simple path from s (the visited
  * set is carried as a '|'-delimited id string, so `NOT LIKE '%|v|%'`
  * enforces simplicity), keeps those ending at t, and emits the distinct
  * edges appearing consecutively on any of them. Exponential — small test
  * graphs only.
  */
object SpgOracle {

  /** SQL over an `edges(src, dst)` table (VARCHAR columns, as created by
    * [[repro.Oracle]]).
    */
  def sql(s: Int, t: Int, k: Int): String =
    s"""
       |WITH RECURSIVE walk(cur, path, len) AS (
       |  SELECT CAST('$s' AS VARCHAR), '|$s|', 0
       |  UNION ALL
       |  SELECT e.dst, w.path || e.dst || '|', w.len + 1
       |  FROM walk w JOIN edges e ON w.cur = e.src
       |  WHERE w.len < $k
       |    AND w.cur <> '$t'
       |    AND w.path NOT LIKE '%|' || e.dst || '|%'
       |),
       |stp AS (SELECT path FROM walk WHERE cur = '$t'),
       |spg AS (
       |  SELECT DISTINCT e.src AS src, e.dst AS dst
       |  FROM edges e JOIN stp p ON p.path LIKE '%|' || e.src || '|' || e.dst || '|%'
       |)
       |SELECT src, dst FROM spg
       |""".stripMargin

  /** A graph's edges as a Spark DataFrame (src, dst) for the oracle. */
  def edgesDf(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    g.edges.map { case (u, v) => (u.toLong, v.toLong) }.toSeq.toDF("src", "dst")
  }

  /** An encoded SPG edge set as a Spark DataFrame (src, dst). */
  def spgDf(spark: SparkSession, edges: Iterable[Long]): DataFrame = {
    import spark.implicits._
    edges.toSeq.sorted
      .map(e => (LocalGraph.src(e).toLong, LocalGraph.dst(e).toLong))
      .toDF("src", "dst")
  }
}

package repro.bench

import repro.core.{Deadline, DeadlineExceeded}

/** Shared knobs and formatting for the per-table benchmark harnesses.
  *
  * Scale is controlled by environment variables so the same code serves CI
  * smoke runs and fuller sweeps:
  *   - REPRO_QUERIES     queries per (dataset, k) point   (default 12)
  *   - REPRO_TIMEOUT_MS  per-query deadline, reported INF (default 2000)
  */
object BenchUtil {

  def queriesPerPoint: Int =
    sys.env.get("REPRO_QUERIES").map(_.toInt).getOrElse(12)

  def timeoutMs: Long =
    sys.env.get("REPRO_TIMEOUT_MS").map(_.toLong).getOrElse(2000L)

  /** Wall-time a thunk in ms (Double). */
  def timeMs[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = body
    (a, (System.nanoTime() - t0) / 1e6)
  }

  /** Run with a deadline; None means the deadline fired (reported as INF). */
  def timed[A](timeoutMs: Long)(body: Long => A): (Option[A], Double) = {
    val t0 = System.nanoTime()
    try {
      val a = body(Deadline.in(timeoutMs))
      (Some(a), (System.nanoTime() - t0) / 1e6)
    } catch {
      case _: DeadlineExceeded => (None, (System.nanoTime() - t0) / 1e6)
    }
  }

  def fmtMs(ms: Double): String =
    if (ms < 0) "INF"
    else if (ms >= 1000) f"${ms / 1000}%.2fs"
    else f"$ms%.1fms"

  def fmtRatio(r: Double): String =
    if (r.isNaN || r.isInfinite || r < 0) "-" else if (r < 0.1) f"$r%.2f" else f"$r%.1f"

  /** GitHub-flavoured markdown table. */
  def markdown(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append("| ").append(headers.mkString(" | ")).append(" |\n")
    sb.append("|").append(headers.map(_ => "---").mkString("|")).append("|\n")
    rows.foreach(r => sb.append("| ").append(r.mkString(" | ")).append(" |\n"))
    sb.toString
  }
}

package repro

import repro.core.Model._

/** Builds DuckDB SQL computing the ground-truth sequence counts of a
  * workload by brute force: an l-way self-join per query constructs every
  * event sequence (same key, strictly increasing times, all inside one
  * window) and counts it per window. The [[Oracle]] diffs this against
  * the executors' output — catching wrong counts, not just "it ran".
  *
  * Expected input tables (all columns VARCHAR, per Oracle's loader):
  *  - `events(key, time, etype)` with `etype` the dictionary-coded int;
  *  - `windows(ws)` — every candidate window start.
  *
  * Output columns: `query_id, window_start, cnt` (aliased identically on
  * the Spark side).
  */
object OracleSql {

  private def querySql(q: Query, typeIds: Map[EventType, Int], win: WindowSpec): String = {
    val l     = q.pattern.length
    val froms = (0 until l).map(i => s"events e$i").mkString(", ")
    val conds = Seq.newBuilder[String]
    for (i <- 0 until l)
      conds += s"e$i.etype = '${typeIds(q.pattern.types(i))}'"
    for (i <- 1 until l) {
      conds += s"e${i - 1}.key = e$i.key"
      conds += s"CAST(e${i - 1}.time AS BIGINT) < CAST(e$i.time AS BIGINT)"
    }
    conds += s"CAST(e0.time AS BIGINT) >= CAST(w.ws AS BIGINT)"
    conds += s"CAST(e${l - 1}.time AS BIGINT) < CAST(w.ws AS BIGINT) + ${win.lengthSec}"
    s"""SELECT ${q.id} AS query_id,
       |       CAST(w.ws AS BIGINT) AS window_start,
       |       COUNT(*) AS cnt
       |FROM windows w, $froms
       |WHERE ${conds.result().mkString("\n  AND ")}
       |GROUP BY w.ws""".stripMargin
  }

  /** Ground-truth SQL for the whole workload (UNION ALL over queries). */
  def workloadSql(workload: Workload, typeIds: Map[EventType, Int]): String =
    workload.queries.map(querySql(_, typeIds, workload.window)).mkString("\nUNION ALL\n")

  /** Candidate window starts covering times `[0, maxTime]`. */
  def windowStarts(maxTime: Long, win: WindowSpec): Seq[Long] =
    (0L to (maxTime / win.slideSec)).map(_ * win.slideSec)
}

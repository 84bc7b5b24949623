package repro

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._

/** OracleSql generation tests (structure of the DuckDB ground-truth SQL). */
class OracleSqlSpec extends AnyFunSuite {
  private val win = WindowSpec(60, 30)
  private val w = Workload(win, Seq(Pattern("A", "B", "C"), Pattern("B", "C")))
  private val ids = Map[EventType, Int]("A" -> 0, "B" -> 1, "C" -> 2)

  test("one SELECT per query, unioned") {
    val sql = OracleSql.workloadSql(w, ids)
    assert(sql.split("UNION ALL").length == 2)
  }

  test("per-query SQL constrains types, key equality, strict time order") {
    val sql = OracleSql.workloadSql(w, ids)
    assert(sql.contains("e0.etype = '0'"))
    assert(sql.contains("e1.etype = '1'"))
    assert(sql.contains("e0.key = e1.key"))
    assert(sql.contains("CAST(e0.time AS BIGINT) < CAST(e1.time AS BIGINT)"))
  }

  test("window containment uses first and last events only") {
    val sql = OracleSql.workloadSql(w, ids)
    assert(sql.contains("CAST(e0.time AS BIGINT) >= CAST(w.ws AS BIGINT)"))
    assert(sql.contains(s"CAST(e2.time AS BIGINT) < CAST(w.ws AS BIGINT) + ${win.lengthSec}"))
  }

  test("output columns are aliased query_id / window_start / cnt") {
    val sql = OracleSql.workloadSql(w, ids)
    assert(sql.contains("AS query_id") && sql.contains("AS window_start") &&
      sql.contains("AS cnt"))
  }

  test("windowStarts covers the stream horizon at slide granularity") {
    assert(OracleSql.windowStarts(100, win) == Seq(0L, 30L, 60L, 90L))
    assert(OracleSql.windowStarts(0, win) == Seq(0L))
  }
}

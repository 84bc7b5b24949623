package repro.exec

import org.apache.spark.sql.DataFrame
import repro.{Oracle, OracleSql, SparkSpec}
import repro.core.{Optimizer, SharablePatterns, SharonGraph}
import repro.core.Model._
import repro.workload.{StreamGen, WorkloadGen}

/** Spark executor integration tests: all four executors (A-Seq, Sharon,
  * Flink-like, SPASS-like) checked against the DuckDB brute-force oracle
  * and against each other on the paper's traffic workload (§8.2 setting,
  * scaled to oracle-tractable streams).
  */
class SparkExecutorsSpec extends SparkSpec {
  import spark.implicits._

  // Scaled-down paper setting: same query shapes, smaller window.
  private val win      = WindowSpec(120, 30)
  private val workload = WorkloadGen.traffic(win)
  private val typeIds  = CompiledPlan.typeDictionary(workload)
  private val nTypes   = typeIds.size
  private val duration = 480L
  private val nEvents  = 240L

  // Events over the workload's alphabet, renamed to dictionary codes.
  private lazy val events =
    StreamGen.uniform(spark, nEvents, duration, nTypes, numKeys = 4, seed = 3)
      .cache()
  private lazy val eventsDf: DataFrame = events.toDF()
  private lazy val windowsDf: DataFrame =
    OracleSql.windowStarts(duration, win).toDF("ws")

  private lazy val rates = StreamGen.uniformRates(nEvents, duration, nTypes)
  private lazy val realRates = Rates(typeIds.map { case (name, _) =>
    name -> nEvents.toDouble / duration / nTypes
  })
  private lazy val sharonPlan = {
    // Optimize over the workload's own alphabet.
    Optimizer.sharon(workload, realRates).plan
  }

  private def oracleCheck(df: DataFrame): Unit =
    Oracle.assertEquivalent(
      df,
      OracleSql.workloadSql(workload, typeIds),
      "events" -> eventsDf, "windows" -> windowsDf)

  private def asMap(df: DataFrame): Map[(Int, Long), Long] =
    df.collect().map(r => (r.getInt(0), r.getLong(1)) -> r.getLong(2)).toMap

  test("A-Seq executor matches the DuckDB oracle on the traffic workload") {
    val res = OnlineExecutors.runASeq(spark, events, workload, typeIds)
    assert(res.metrics.events > 0)
    oracleCheck(res.counts)
  }

  test("Sharon executor matches the DuckDB oracle under the optimal plan") {
    assert(sharonPlan.nonEmpty, "expected sharing opportunities in the traffic workload")
    val res = OnlineExecutors.runSharon(spark, events, workload, sharonPlan, typeIds)
    oracleCheck(res.counts)
  }

  test("Flink-like two-step executor matches the DuckDB oracle") {
    val res = TwoStepExecutors.runFlinkLike(spark, eventsDf, workload, typeIds)
    assert(res.matchesConstructed > 0)
    oracleCheck(res.counts)
  }

  test("SPASS-like two-step executor matches the DuckDB oracle") {
    val res = TwoStepExecutors.runSpassLike(spark, eventsDf, workload, sharonPlan, typeIds)
    oracleCheck(res.counts)
  }

  test("all four executors agree with each other") {
    val aseq   = asMap(OnlineExecutors.runASeq(spark, events, workload, typeIds).counts)
    val sharon = asMap(OnlineExecutors.runSharon(spark, events, workload, sharonPlan, typeIds).counts)
    val flink  = asMap(TwoStepExecutors.runFlinkLike(spark, eventsDf, workload, typeIds).counts)
    val spass  = asMap(TwoStepExecutors.runSpassLike(spark, eventsDf, workload, sharonPlan, typeIds).counts)
    assert(sharon == aseq)
    assert(flink == aseq)
    assert(spass == aseq)
  }

  test("Sharon under the greedy plan also matches A-Seq (plan changes cost, not results)") {
    val greedyPlan = Optimizer.greedy(workload, realRates).plan
    val g   = asMap(OnlineExecutors.runSharon(spark, events, workload, greedyPlan, typeIds).counts)
    val a   = asMap(OnlineExecutors.runASeq(spark, events, workload, typeIds).counts)
    assert(g == a)
  }

  test("sharing reduces engine work on the traffic workload") {
    val aseq   = OnlineExecutors.runASeq(spark, events, workload, typeIds)
    val sharon = OnlineExecutors.runSharon(spark, events, workload, sharonPlan, typeIds)
    assert(sharon.metrics.countUpdates < aseq.metrics.countUpdates)
  }

  test("purchase workload: online executors match the oracle") {
    val pw  = WorkloadGen.purchases(WindowSpec(120, 30))
    val ids = CompiledPlan.typeDictionary(pw)
    val ev  = StreamGen.uniform(spark, 200, duration, ids.size, numKeys = 3, seed = 5).cache()
    val r   = Rates(ids.map { case (n, _) => n -> 200.0 / duration / ids.size })
    val plan = Optimizer.sharon(pw, r).plan
    val aseq   = OnlineExecutors.runASeq(spark, ev, pw, ids)
    val sharon = OnlineExecutors.runSharon(spark, ev, pw, plan, ids)
    Oracle.assertEquivalent(aseq.counts, OracleSql.workloadSql(pw, ids),
      "events" -> ev.toDF(), "windows" -> windowsDf)
    assert(asMap(aseq.counts) == asMap(sharon.counts))
  }

  test("parametric workload at larger key counts: Sharon == A-Seq") {
    val w    = WorkloadGen.generate(numQueries = 8, patternLen = 4, numTypes = 10,
      numBackbones = 2, window = WindowSpec(60, 20), seed = 9)
    val ids  = StreamGen.typeIds(10)
    val ev   = StreamGen.uniform(spark, 500, 300, 10, numKeys = 16, seed = 11).cache()
    val r    = StreamGen.uniformRates(500, 300, 10)
    val plan = Optimizer.sharon(w, r).plan
    val a = asMap(OnlineExecutors.runASeq(spark, ev, w, ids).counts)
    val s = asMap(OnlineExecutors.runSharon(spark, ev, w, plan, ids).counts)
    assert(a == s)
    assert(a.nonEmpty)
  }
}

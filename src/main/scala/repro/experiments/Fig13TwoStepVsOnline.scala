package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core.Optimizer
import repro.core.Model._
import repro.exec.{CompiledPlan, OnlineExecutors, TwoStepExecutors}
import repro.workload.{StreamGen, WorkloadGen}
import Harness._

/** Figure 13 reproduction: two-step (Flink-like, SPASS-like) versus
  * online (A-Seq, Sharon) approaches on a Linear-Road-like stream,
  * varying the number of events per window; latency and throughput.
  *
  * Paper setting: LR data set, up to 7k events/window; Flink fails above
  * 6k, SPASS above 7k (41 min/window), online approaches are ~5 orders of
  * magnitude faster. Scaled here: the traffic workload q1–q7 over a
  * 60 s / 30 s window; two-step runs above `twoStepCutoff` events/window
  * are reported DNF instead of hanging the bench (the paper reports the
  * same as "does not terminate").
  */
object Fig13TwoStepVsOnline {

  final case class Params(
      eventsPerWindow: Seq[Int] = Seq(500, 1000, 2000, 4000, 8000),
      twoStepCutoff: Int = 8000,
      window: WindowSpec = WindowSpec(60, 30),
      numKeys: Int = 20,
      seed: Long = 17)

  def run(spark: SparkSession, p: Params = Params()): ExperimentTable = {
    val workload = WorkloadGen.traffic(p.window)
    val typeIds  = CompiledPlan.typeDictionary(workload)
    val nTypes   = typeIds.size
    val duration = p.window.lengthSec * 2
    // Warm up Spark/JIT so the first measured point is not inflated by
    // classloading and first-job overheads.
    locally {
      val ev = StreamGen.linearRoadLike(spark, 100, duration, nTypes, p.numKeys, 1).cache()
      ev.count()
      OnlineExecutors.runASeq(spark, ev, workload, typeIds)
      TwoStepExecutors.runFlinkLike(spark, ev.toDF(), workload, typeIds)
      ev.unpersist()
    }
    val rows = p.eventsPerWindow.map { epw =>
      val nEvents = epw.toLong * duration / p.window.lengthSec
      val events = StreamGen.linearRoadLike(
        spark, nEvents, duration, nTypes, p.numKeys, p.seed).cache()
      events.count()
      val eventsDf = events.toDF()
      // Per-window rate units (see StreamGen.perWindowRates).
      val rates = Rates(typeIds.map { case (n, _) =>
        n -> epw.toDouble / nTypes })
      val plan = Optimizer.sharon(workload, rates).plan

      def thr(msTotal: Double): String =
        if (msTotal <= 0) "-" else f"${nEvents * workload.size / (msTotal / 1000)}%.0f"

      val (aseqMs, sharonMs) = {
        val a = OnlineExecutors.runASeq(spark, events, workload, typeIds)
        val s = OnlineExecutors.runSharon(spark, events, workload, plan, typeIds)
        (a.millis, s.millis)
      }
      val (flinkMs, spassMs) =
        if (epw > p.twoStepCutoff) (None, None)
        else {
          val f = TwoStepExecutors.runFlinkLike(spark, eventsDf, workload, typeIds)
          val s = TwoStepExecutors.runSpassLike(spark, eventsDf, workload, plan, typeIds)
          (Some(f.millis), Some(s.millis))
        }
      events.unpersist()
      Seq(epw.toString,
        flinkMs.map(ms).getOrElse("DNF"), spassMs.map(ms).getOrElse("DNF"),
        ms(aseqMs), ms(sharonMs),
        flinkMs.map(thr).getOrElse("DNF"), spassMs.map(thr).getOrElse("DNF"),
        thr(aseqMs), thr(sharonMs))
    }
    ExperimentTable(
      "Fig 13: two-step vs online (LR-like stream, traffic workload)",
      Seq("events/window", "Flink-like ms", "SPASS-like ms", "A-Seq ms", "Sharon ms",
        "Flink ev/s", "SPASS ev/s", "A-Seq ev/s", "Sharon ev/s"),
      rows)
  }
}

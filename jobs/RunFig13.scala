package repro.jobs

import repro.experiments.{Fig13TwoStepVsOnline, Harness}

/** spark-submit entrypoint for the Figure 13 reproduction (two-step vs
  * online approaches). Optional args: eventsPerWindow values, e.g.
  * `RunFig13 500 1000 2000`.
  */
object RunFig13 {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("sharon-fig13")
    val params =
      if (args.isEmpty) Fig13TwoStepVsOnline.Params()
      else Fig13TwoStepVsOnline.Params(eventsPerWindow = args.map(_.toInt).toSeq)
    println(Fig13TwoStepVsOnline.run(spark, params).render)
    spark.stop()
  }
}

package repro.jobs

import repro.experiments.{Fig16PlanQuality, Harness}

/** spark-submit entrypoint for the Figure 16 reproduction (executor under
  * greedy vs optimal sharing plans). Optional args: query counts.
  */
object RunFig16 {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("sharon-fig16")
    val params =
      if (args.isEmpty) Fig16PlanQuality.Params()
      else Fig16PlanQuality.Params(numClusters = args.map(_.toInt).toSeq)
    println(Fig16PlanQuality.run(spark, params).render)
    spark.stop()
  }
}

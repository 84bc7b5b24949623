package repro.jobs

import repro.experiments.{Fig14OnlineApproaches, Harness}

/** spark-submit entrypoint for the Figure 14 reproduction (A-Seq vs
  * Sharon under high-rate streams). Optional arg selects the sweep:
  * `events`, `queries`, `length`, or `all` (default).
  */
object RunFig14 {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("sharon-fig14")
    val which = args.headOption.getOrElse("all")
    val p     = Fig14OnlineApproaches.Params()
    if (which == "events" || which == "all")
      println(Fig14OnlineApproaches.runEventsSweep(spark, p).render)
    if (which == "queries" || which == "all")
      println(Fig14OnlineApproaches.runQueriesSweep(spark, p).render)
    if (which == "length" || which == "all")
      println(Fig14OnlineApproaches.runLengthSweep(spark, p).render)
    spark.stop()
  }
}

package repro.jobs

import repro.experiments.Fig15OptimizerComparison

/** Entrypoint for the Figure 15 reproduction (optimizer comparison —
  * pure compile-time experiment, no Spark needed). Optional args: query
  * counts, e.g. `RunFig15 10 20 30`.
  */
object RunFig15 {
  def main(args: Array[String]): Unit = {
    val params =
      if (args.isEmpty) Fig15OptimizerComparison.Params()
      else Fig15OptimizerComparison.Params(numQueries = args.map(_.toInt).toSeq)
    println(Fig15OptimizerComparison.run(params).render)
  }
}

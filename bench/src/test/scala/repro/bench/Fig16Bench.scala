package repro.bench

import repro.SparkSpec
import repro.experiments.Fig16PlanQuality
import repro.experiments.Fig16PlanQuality.Params

/** Figure 16 bench: Sharon executor guided by a greedy vs an optimal
  * sharing plan. Prints the reproduction table and asserts the paper's
  * shape: the optimal plan's score dominates and its executor cost
  * (work/memory) is no worse, with the gap present at scale.
  */
class Fig16Bench extends SparkSpec {

  private val p = Params()
  private lazy val table = Fig16PlanQuality.run(spark, p)

  test("Fig 16 table: executor under greedy vs optimal plan") {
    println(table.render)
    assert(table.rows.size == p.numClusters.size)
  }

  test("shape: optimal plan score >= greedy plan score everywhere") {
    table.rows.foreach { r =>
      assert(r(2).toDouble + 1e-6 >= r(1).toDouble, s"at ${r(0)} queries")
    }
  }

  test("shape: optimal plan does not increase model work; helps at scale") {
    val workRatios = table.rows.map(r => r(11).toDouble) // greedy/optimal work
    info(s"greedy/optimal work ratios: $workRatios")
    assert(workRatios.forall(_ >= 0.95))
    assert(workRatios.max > 1.0,
      "the optimal plan should beat the greedy plan somewhere in the sweep")
  }
}

package repro.jobs

import repro.core.{Gwmin, Optimizer, Reduction, SharablePatterns, SharonGraph}
import repro.core.Model._
import repro.workload.WorkloadGen

/** Entrypoint reproducing the paper's running example end to end:
  * Table 1 (sharing candidates of the traffic workload), the Fig 4 graph
  * statistics, and the Example 10/12 greedy-vs-optimal plans under the
  * cost model with uniform rates.
  */
object RunTable1 {
  def main(args: Array[String]): Unit = {
    val workload = WorkloadGen.traffic()
    val sharable = SharablePatterns.detect(workload)
    println("== Table 1: sharing candidates of the traffic workload ==")
    sharable.toSeq.sortBy(_._1.toString).foreach { case (p, qs) =>
      println(f"$p%-34s -> ${qs.map(q => s"q${q.id}").mkString(", ")}")
    }
    val rates = Rates(workload.queries.flatMap(_.pattern.types).distinct.map(_ -> 1.0).toMap)
    val g = SharonGraph.construct(rates, sharable)
    println(s"\n== Sharon graph (Fig 4 shape, cost-model weights @unit rates) ==")
    println(s"vertices=${g.size} edges=${g.edgeCount} guaranteedWeight=${g.guaranteedWeight}")
    g.vertices.zipWithIndex.foreach { case (v, i) =>
      println(f"  $v%-60s degree=${g.degree(i)}")
    }
    val red = Reduction.reduce(g)
    println(s"reduced: ${red.reduced.size} vertices, conflict-free: ${red.conflictFree.size}")
    val (gp, gs) = Gwmin.plan(g)
    println(f"\ngreedy plan  (score $gs%.2f): ${gp.mkString("; ")}")
    val so = Optimizer.sharon(workload, rates)
    println(f"optimal plan (score ${so.score}%.2f): ${so.plan.mkString("; ")}")

    // Example 12 at execution scale: under the calibrated hot/rare street
    // profile the greedy plan's score is visibly below the optimal one.
    val skew = Rates(WorkloadGen.trafficClusterRates)
    val g2 = SharonGraph.construct(skew, sharable)
    val (_, gs2) = Gwmin.plan(g2)
    val so2 = Optimizer.sharon(workload, skew)
    println(f"\n== Example 12 under the hot/rare street rates ==")
    println(f"graph: ${g2.size} vertices, ${g2.edgeCount} conflicts")
    println(f"greedy score  = $gs2%.1f")
    println(f"optimal score = ${so2.score}%.1f (${so2.score / gs2}%.2f-fold, paper: 43 vs 50)")
  }
}

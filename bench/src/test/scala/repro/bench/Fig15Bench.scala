package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.Fig15OptimizerComparison
import repro.experiments.Fig15OptimizerComparison.Params

/** Figure 15 bench (pure compile-time; no Spark): GO vs SO vs EO.
  * Prints the reproduction table and asserts the paper's shape: GO is the
  * cheapest, SO completes everywhere with a score >= GO, EO blows up
  * (DNF) beyond small workloads.
  */
class Fig15Bench extends AnyFunSuite {

  private val p = Params()
  private lazy val table = Fig15OptimizerComparison.run(p)

  test("Fig 15 table: optimizer latency/memory per query count") {
    println(table.render)
    assert(table.rows.size == p.numQueries.size)
  }

  test("shape: GO is always the fastest optimizer") {
    table.rows.foreach { r =>
      val goMs = r(1).toDouble
      val soMs = r(2).toDouble
      assert(goMs <= soMs, s"GO ($goMs) should not exceed SO ($soMs) at ${r(0)} queries")
    }
  }

  test("shape: SO plan score is never below GO's") {
    table.rows.foreach { r =>
      val goScore = r(7).toDouble
      val soScore = r(8).stripSuffix("*").toDouble
      assert(soScore + 1e-6 >= goScore, s"at ${r(0)} queries")
    }
  }

  test("shape: EO equals SO score where it completes, and DNFs at scale") {
    val completed = table.rows.filter(r => r(3) != "DNF")
    completed.foreach { r =>
      assert(math.abs(r(8).stripSuffix("*").toDouble - r(9).toDouble) < 1e-6,
        s"EO and SO disagree at ${r(0)} queries")
    }
    val dnfs = table.rows.count(r => r(3) == "DNF")
    info(s"EO completed on ${completed.size} points, DNF on $dnfs")
    assert(dnfs >= 1, "EO should fail beyond small workloads (paper: >20 queries)")
  }

  test("shape: EO latency dwarfs GO where both complete") {
    table.rows.filter(r => r(3) != "DNF").foreach { r =>
      assert(r(3).toDouble >= r(1).toDouble, s"at ${r(0)} queries")
    }
  }
}

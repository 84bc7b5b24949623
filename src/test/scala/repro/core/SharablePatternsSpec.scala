package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._
import repro.workload.WorkloadGen

/** Modified CCSpan tests (Appendix A, Algorithm 7) — must reproduce the
  * paper's Table 1 exactly on the traffic workload.
  */
class SharablePatternsSpec extends AnyFunSuite {
  import PaperFixtures._

  private val detected = SharablePatterns.detect(workload)

  test("traffic workload yields exactly the 7 candidates of Table 1") {
    assert(detected.keySet == table1.keySet)
  }

  test("each candidate maps to the query set of Table 1") {
    for ((p, qids) <- table1)
      assert(detected(p).map(_.id).sorted == qids.sorted, s"for $p")
  }

  test("no length-1 patterns are reported (sharing them is not beneficial)") {
    assert(detected.keys.forall(_.length > 1))
  }

  test("every reported pattern appears in more than one query (Definition 3)") {
    assert(detected.values.forall(_.size > 1))
  }

  test("query order within a candidate follows workload order") {
    assert(detected(p1).map(_.id) == Vector(1, 2, 3, 4))
  }

  test("purchase workload: (Laptop, Case) is shared by all four queries") {
    val d = SharablePatterns.detect(WorkloadGen.purchases())
    assert(d(Pattern("Laptop", "Case")).map(_.id).sorted == Seq(8, 9, 10, 11))
  }

  test("purchase workload: (Laptop, Case, Adapter) is shared by q8 and q10") {
    val d = SharablePatterns.detect(WorkloadGen.purchases())
    assert(d(Pattern("Laptop", "Case", "Adapter")).map(_.id).sorted == Seq(8, 10))
  }

  test("workload with no overlap yields no candidates") {
    val w = Workload(WindowSpec(10, 1), Seq(Pattern("A", "B"), Pattern("C", "D")))
    assert(SharablePatterns.detect(w).isEmpty)
  }

  test("identical patterns are sharable as a whole") {
    val w = Workload(WindowSpec(10, 1), Seq(Pattern("A", "B"), Pattern("A", "B")))
    val d = SharablePatterns.detect(w)
    assert(d.keySet == Set(Pattern("A", "B")))
    assert(d(Pattern("A", "B")).size == 2)
  }

  test("detection is linear-ish: all sub-patterns of every query are considered") {
    val w = Workload(WindowSpec(10, 1),
      Seq(Pattern("A", "B", "C", "D"), Pattern("B", "C", "D", "E")))
    val d = SharablePatterns.detect(w)
    assert(d.keySet == Set(Pattern("B", "C"), Pattern("C", "D"),
      Pattern("B", "C", "D")))
  }
}

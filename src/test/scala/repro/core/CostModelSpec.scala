package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._

/** Sharing benefit model tests (paper §3, Equations 1–8), hand-computed
  * on the traffic workload with unit rates and on asymmetric rates.
  */
class CostModelSpec extends AnyFunSuite {
  import PaperFixtures._

  private val unit = Rates(workload.queries.flatMap(_.pattern.types)
    .distinct.map(_ -> 1.0).toMap)
  private def q(id: Int): Query = workload.queries.find(_.id == id).get

  test("Eq 2: NonShared(q1) = Rate(OakSt) × Rate(q1 pattern) = 1 × 3") {
    assert(CostModel.nonSharedQuery(unit, q(1)) == 3.0)
  }

  test("Eq 3: NonShared(p1, {q1..q4}) = 3+3+4+4 = 14") {
    assert(CostModel.nonShared(unit, Seq(q(1), q(2), q(3), q(4))) == 14.0)
  }

  test("Eq 4: Comp for q3 sharing p1 = prefix (LindenSt,ParkAve) cost 2") {
    assert(CostModel.comp(unit, p1, q(3)) == 2.0)
  }

  test("Eq 4: Comp for q4 sharing p1 = prefix 1 + suffix 1 = 2") {
    assert(CostModel.comp(unit, p1, q(4)) == 2.0)
  }

  test("Eq 4: Comp is zero when the query equals the shared pattern") {
    assert(CostModel.comp(unit, p6, q(5)) == 0.0)
  }

  test("Eq 5: Comb for q4 sharing p1 = 1×1×1 (prefix, p, suffix starts)") {
    assert(CostModel.comb(unit, p1, q(4)) == 1.0)
  }

  test("Eq 5: Comb degenerates with an empty prefix (q1 sharing p1)") {
    assert(CostModel.comb(unit, p1, q(1)) == 1.0) // Rate(p start) × Rate(suffix head)
  }

  test("Eq 5: Comb is zero when prefix and suffix are both empty") {
    assert(CostModel.comb(unit, p6, q(5)) == 0.0)
  }

  test("Eq 7: Shared(p1, {q1..q4}) = 2 + (2+2+3+3) = 12") {
    assert(CostModel.shared(unit, p1, Seq(q(1), q(2), q(3), q(4))) == 12.0)
  }

  test("Eq 8: BValue(p1, {q1..q4}) = 14 − 12 = 2 with unit rates") {
    assert(CostModel.bValue(unit, p1, Seq(q(1), q(2), q(3), q(4))) == 2.0)
  }

  test("benefit grows with the number of sharing queries") {
    val b2 = CostModel.bValue(unit, p1, Seq(q(1), q(2)))
    val b4 = CostModel.bValue(unit, p1, Seq(q(1), q(2), q(3), q(4)))
    assert(b4 > b2)
  }

  test("benefit grows with the stream rate (§3.4 cost factors)") {
    // Identical queries share the whole pattern (no combination): every
    // cost term is quadratic, so scaling rates by 10 scales BValue by 100.
    val w2 = Workload(WindowSpec(10, 1), Seq(Pattern("A", "B"), Pattern("A", "B")))
    val r1 = Rates(Map("A" -> 1.0, "B" -> 1.0))
    val r10 = Rates(Map("A" -> 10.0, "B" -> 10.0))
    val base = CostModel.bValue(r1, Pattern("A", "B"), w2.queries)
    assert(base > 0)
    assert(CostModel.bValue(r10, Pattern("A", "B"), w2.queries) == 100 * base)
  }

  test("benefit can fall with rate when the cubic Comb term dominates (p1 in q4)") {
    // For candidates needing a prefix × p × suffix combination, Eq 5 is
    // cubic in the rate while the Eq 2 saving is quadratic — sharing such
    // patterns becomes non-beneficial on hot streams.
    val hot = Rates(unit.perType.view.mapValues(_ * 10).toMap)
    assert(CostModel.bValue(hot, p1, Seq(q(1), q(2), q(3), q(4))) <
      CostModel.bValue(unit, p1, Seq(q(1), q(2), q(3), q(4))))
  }

  test("a candidate can be non-beneficial: two queries sharing a 2-pattern suffix-free") {
    // Workload: (A,B) and (C,A,B). Sharing (A,B): NonShared = 1×2 + 1×3 = 5.
    // Shared = 1×2 (p once) + [q1: 0] + [q2: comp 1×1=1, comb 1×1=1] = 4.
    val w = Workload(WindowSpec(10, 1), Seq(Pattern("A", "B"), Pattern("C", "A", "B")))
    val r = Rates(Map("A" -> 1.0, "B" -> 1.0, "C" -> 1.0))
    assert(CostModel.bValue(r, Pattern("A", "B"), w.queries) == 1.0)
    // With a hot prefix type C the combination overhead dominates:
    // NonShared = 1×2 + 10×12 = 122; Shared = 2 + (10×10 comp + 10×1 comb) = 112.
    val skew = Rates(Map("A" -> 1.0, "B" -> 1.0, "C" -> 10.0))
    assert(CostModel.bValue(skew, Pattern("A", "B"), w.queries) == 10.0)
  }

  test("non-beneficial example: rare shared pattern inside hot-prefix queries") {
    // q1=(C,A,B), q2=(D,A,B); sharing (A,B) must pay two combinations.
    val w = Workload(WindowSpec(10, 1),
      Seq(Pattern("C", "A", "B"), Pattern("D", "A", "B")))
    // Sharing saves Σ_q Rate(C_q)·Rate(B) but pays Rate(A)·Rate(A,B) for
    // aggregating p once: with a hot START type A and rare B/C/D the
    // shared pattern's own cost dominates the saving.
    val r = Rates(Map("A" -> 10.0, "B" -> 0.1, "C" -> 0.1, "D" -> 0.1))
    assert(CostModel.bValue(r, Pattern("A", "B"), w.queries) < 0.0)
  }

  test("BValue of the whole-pattern share of identical queries is maximal") {
    val w = Workload(WindowSpec(10, 1), Seq(Pattern("A", "B"), Pattern("A", "B")))
    val r = Rates(Map("A" -> 2.0, "B" -> 3.0))
    // NonShared = 2×5 + 2×5 = 20; Shared = 2×5 + 0 + 0 = 10.
    assert(CostModel.bValue(r, Pattern("A", "B"), w.queries) == 10.0)
  }
}

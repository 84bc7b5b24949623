package repro.core

import repro.core.Model._
import repro.workload.WorkloadGen

/** Shared fixtures: the paper's running example — the traffic workload
  * q1–q7 (Fig 1), its sharing candidates p1–p7 (Table 1), and the Sharon
  * graph of Fig 4 with the benefit values used in Examples 5–12
  * (25, 9, 12, 15, 20, 8, 18).
  */
object PaperFixtures {
  val workload: Workload = WorkloadGen.traffic()
  private val byId = workload.queries.map(q => q.id -> q).toMap

  val p1: Pattern = Pattern("OakSt", "MainSt")
  val p2: Pattern = Pattern("ParkAve", "OakSt")
  val p3: Pattern = Pattern("ParkAve", "OakSt", "MainSt")
  val p4: Pattern = Pattern("MainSt", "WestSt")
  val p5: Pattern = Pattern("OakSt", "MainSt", "WestSt")
  val p6: Pattern = Pattern("MainSt", "StateSt")
  val p7: Pattern = Pattern("ElmSt", "ParkAve")

  /** Table 1: candidate -> queries containing it. */
  val table1: Map[Pattern, Seq[Int]] = Map(
    p1 -> Seq(1, 2, 3, 4), p2 -> Seq(3, 4), p3 -> Seq(3, 4),
    p4 -> Seq(2, 4), p5 -> Seq(2, 4), p6 -> Seq(1, 5), p7 -> Seq(6, 7))

  /** Benefit values of Fig 4 / Example 7. */
  val weights: Map[Pattern, Double] = Map(
    p1 -> 25.0, p2 -> 9.0, p3 -> 12.0, p4 -> 15.0,
    p5 -> 20.0, p6 -> 8.0, p7 -> 18.0)

  def cand(p: Pattern, qids: Seq[Int], w: Double): Candidate =
    Candidate(p, qids.map(byId).toVector, w)

  def cand(p: Pattern): Candidate = cand(p, table1(p), weights(p))

  /** The Sharon graph of Fig 4 (edges derived by Definition 6). */
  def figure4Graph: SharonGraph =
    SharonGraph.fromCandidates(table1.keys.map(cand).toSeq)

  /** Vertex index of pattern `p` in `g`. */
  def idx(g: SharonGraph, p: Pattern): Int =
    g.vertices.indexWhere(_.pattern == p)
}

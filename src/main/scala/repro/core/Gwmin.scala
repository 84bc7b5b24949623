package repro.core

import scala.collection.mutable

/** GWMIN — the greedy minimum-degree algorithm for the Maximum Weight
  * Independent Set problem (Sakai et al.; paper Appendix B, Algorithm 8).
  *
  * Repeatedly picks the vertex maximizing `weight(v)/(degree(v)+1)` in
  * the residual graph, adds it to the independent set, and deletes it
  * together with its neighbors. The returned set's weight is at least the
  * graph's `guaranteedWeight` (Eq 10) — the bound the Sharon optimizer
  * uses for conflict-ridden candidate pruning (§5).
  */
object Gwmin {

  /** Returns the indices (into `g.vertices`) of the greedy independent
    * set, in selection order.
    */
  def independentSet(g: SharonGraph): Vector[Int] = {
    val alive  = mutable.BitSet(g.vertices.indices: _*)
    val degree = Array.tabulate(g.size)(g.degree)
    val picked = Vector.newBuilder[Int]
    while (alive.nonEmpty) {
      val v = alive.maxBy(i => g.vertices(i).weight / (degree(i) + 1))
      picked += v
      val removed = g.neighbors(v).filter(alive) + v
      alive --= removed
      for (r <- removed; n <- g.neighbors(r) if alive(n)) degree(n) -= 1
    }
    picked.result()
  }

  /** The greedy plan as candidates, with its score. */
  def plan(g: SharonGraph): (Vector[Candidate], Double) = {
    val is = independentSet(g).map(g.vertices)
    (is, is.map(_.weight).sum)
  }
}

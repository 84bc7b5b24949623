package repro.core

import scala.collection.mutable
import Model._

/** Sharable pattern detection — the modified CCSpan algorithm
  * (Appendix A, Algorithm 7).
  *
  * A pattern `p` is *sharable* in workload `Q` if `p.length > 1` and `p`
  * appears (contiguously) in more than one query (Definition 3). Unlike
  * the original CCSpan, all frequent contiguous sub-patterns are kept,
  * not only closed ones, because shorter patterns are sharable by more
  * queries.
  */
object SharablePatterns {

  /** Returns each sharable pattern mapped to the set of queries that
    * contain it — the hash table `S` of Algorithm 7. Query lists preserve
    * workload order (the paper indexes queries by their position, §4).
    */
  def detect(workload: Workload): Map[Pattern, Vector[Query]] = {
    val h = mutable.LinkedHashMap.empty[Pattern, mutable.ArrayBuffer[Query]]
    for {
      q   <- workload.queries
      sub <- q.pattern.subPatterns // all contiguous sub-patterns, length > 1
    } h.getOrElseUpdate(sub, mutable.ArrayBuffer.empty) += q
    h.iterator
      .filter { case (_, qs) => qs.size > 1 }
      .map { case (p, qs) => p -> qs.toVector }
      .toMap
  }
}

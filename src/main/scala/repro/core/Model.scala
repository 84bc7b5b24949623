package repro.core

/** Data/query model of Sharon (paper §2.1).
  *
  * An event sequence pattern is an ordered list of event types
  * (Definition 1); an event sequence aggregation query (Definition 2)
  * pairs a pattern with a sliding window and an equality predicate on a
  * key attribute (e.g. `[vehicle]`). Under the paper's core assumptions
  * (§2.1) all queries of a workload have the same predicate, grouping and
  * window, and an event type appears at most once in a pattern.
  */
object Model {

  /** Event types are symbolic names, e.g. street names or item kinds. */
  type EventType = String

  /** An event sequence pattern `(E_1 ... E_l)`, `l >= 1` (Definition 1). */
  final case class Pattern(types: Vector[EventType]) {
    require(types.nonEmpty, "a pattern has length >= 1")

    def length: Int = types.size

    /** First event type — its matches are the START events (Definition 1). */
    def startType: EventType = types.head

    /** Last event type — its matches are the END events. */
    def endType: EventType = types.last

    /** All contiguous sub-patterns of length > 1 (Appendix A, Alg 7). */
    def subPatterns: Seq[Pattern] =
      for {
        start <- 0 until length
        end   <- (start + 2) to length
      } yield Pattern(types.slice(start, end))

    /** 0-based start index of `p` inside this pattern, if `p` occurs
      * contiguously. Unique when event types are distinct in a pattern
      * (assumption 3, §2.1).
      */
    def indexOf(p: Pattern): Option[Int] = {
      val i = types.indexOfSlice(p.types)
      if (i >= 0) Some(i) else None
    }

    def contains(p: Pattern): Boolean = indexOf(p).isDefined

    /** Prefix of a sharable pattern `p` in this pattern (Definition 4):
      * the sub-pattern strictly before `p`'s occurrence (possibly empty).
      */
    def prefixOf(p: Pattern): Vector[EventType] = {
      val i = indexOf(p).getOrElse(
        throw new IllegalArgumentException(s"$p does not occur in $this"))
      types.take(i)
    }

    /** Suffix of a sharable pattern `p` in this pattern (Definition 4). */
    def suffixOf(p: Pattern): Vector[EventType] = {
      val i = indexOf(p).getOrElse(
        throw new IllegalArgumentException(s"$p does not occur in $this"))
      types.drop(i + p.length)
    }

    /** True iff the occurrences of `a` and `b` inside this pattern share
      * at least one position — the overlap condition of Definition 6
      * (`A_{n-k}..A_n = B_0..B_k` inside the query's pattern).
      */
    def occurrencesOverlap(a: Pattern, b: Pattern): Boolean =
      (indexOf(a), indexOf(b)) match {
        case (Some(ia), Some(ib)) =>
          val (aEnd, bEnd) = (ia + a.length - 1, ib + b.length - 1)
          ia <= bEnd && ib <= aEnd
        case _ => false
      }

    override def toString: String = types.mkString("(", ", ", ")")
  }

  object Pattern {
    /** Convenience constructor: `Pattern("A", "B", "C")`. */
    def apply(first: EventType, rest: EventType*): Pattern =
      Pattern((first +: rest).toVector)
  }

  /** Sliding window `WITHIN lengthSec SLIDE slideSec` (Definition 2).
    * Windows are the half-open intervals `[i*slide, i*slide + length)`,
    * `i >= 0`, over the non-negative integer timeline (§2.1).
    */
  final case class WindowSpec(lengthSec: Long, slideSec: Long) {
    require(lengthSec > 0 && slideSec > 0 && slideSec <= lengthSec,
      s"invalid window $this")

    /** Start times of all windows containing time point `t`. */
    def windowsOf(t: Long): Seq[Long] = {
      val last  = math.floorDiv(t, slideSec)
      val first = math.max(0L, math.floorDiv(t - lengthSec, slideSec) + 1)
      (first to last).map(_ * slideSec)
    }

    /** End (exclusive) of the last window containing `t` — an event is
      * expired once current time reaches this (Fig 6(b), §3.2).
      */
    def lastWindowEnd(t: Long): Long =
      math.floorDiv(t, slideSec) * slideSec + lengthSec
  }

  /** An event sequence aggregation query (Definition 2), restricted to
    * COUNT(*) with an equality predicate on one key attribute — the class
    * the paper evaluates (q1–q11). `id` doubles as the query's position
    * in the workload (§4, data structures).
    */
  final case class Query(id: Int, pattern: Pattern, window: WindowSpec) {
    require(pattern.types.distinct.size == pattern.length,
      s"event types must be distinct within a pattern (assumption 3): $pattern")
    override def toString: String = s"q$id:$pattern"
  }

  /** A static workload of queries over one stream (§2.2). */
  final case class Workload(queries: Vector[Query]) {
    require(queries.map(_.id).distinct.size == queries.size, "duplicate query ids")
    require(queries.map(_.window).distinct.size <= 1,
      "all queries share the same window (assumption 2)")
    def size: Int = queries.size
    def window: WindowSpec = queries.head.window
  }

  object Workload {
    /** Builds a workload from raw patterns; ids follow list order. */
    def apply(window: WindowSpec, patterns: Seq[Pattern]): Workload =
      Workload(patterns.zipWithIndex.map { case (p, i) => Query(i, p, window) }.toVector)
  }

  /** Per-type event arrival rates (events/sec) driving the cost model
    * (§3, Eq 1). Types missing from the map have rate 0.
    */
  final case class Rates(perType: Map[EventType, Double]) {
    def apply(t: EventType): Double = perType.getOrElse(t, 0.0)

    /** `Rate(P) = Σ_j Rate(E_j)` — rate of events matched by `P` (Eq 1). */
    def ofPattern(types: Seq[EventType]): Double = types.map(apply).sum
  }
}

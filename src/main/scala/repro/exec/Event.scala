package repro.exec

/** One stream event: a key (the equality-predicate attribute, e.g.
  * vehicle or customer id), a second-granularity timestamp, and a
  * dictionary-coded event type (paper §2.1).
  */
final case class Event(key: Long, time: Long, etype: Int)

/** Per-key partial result: sequence count of `queryId` in the window
  * starting at `windowStart`, restricted to one key group. Workload
  * results sum this over keys (the `[vehicle]` predicate partitions
  * matches by key; COUNT(*) per window totals the groups).
  */
final case class QueryWindowCount(queryId: Int, windowStart: Long, count: Long)

package repro.exec

import scala.collection.mutable
import repro.core.Model.WindowSpec
import CompiledPlan._

/** The Sharon runtime engine for one key group (paper §3) — shared online
  * event sequence aggregation without sequence construction.
  *
  * Events arrive in time order. Each *segment runtime* implements the
  * A-Seq kernel (§3.2, Fig 6): one count per segment prefix per
  * non-expired START event; shared segments are evaluated once for all
  * subscribing queries. Each *query runtime* implements count combination
  * (§3.3, Fig 7): when segment `S_j`'s START event `c` arrives it
  * snapshots the running combined count of `S_1..S_{j-1}` per overall
  * START `a`; when sequences of `S_j` starting at `c` complete with
  * increment `δ`, it adds `snap(a,c) × δ` to the combined count per `a`.
  * The END event of the last segment updates the result of every window
  * it falls into, restricted to STARTs `a` inside that window
  * (Fig 6(b) expiration semantics).
  *
  * Timestamp ties: sequence semantics require strictly increasing times
  * (Definition 1), so events sharing a timestamp are evaluated against
  * the state as of strictly-earlier times — reads happen for the whole
  * tie-batch first, state mutations are committed afterwards.
  */
final class KeyGroupEngine(cw: CompiledWorkload, metrics: EngineMetrics) {
  private val win: WindowSpec = cw.window

  /** Per-START-event state of one segment: `counts(j)` = number of
    * matches of the segment's first `j+1` types starting at this START
    * (`counts(0)` is identically 1 — the START itself).
    */
  final class StartState(val time: Long, nLevels: Int) {
    val counts = new Array[Long](nLevels)
    counts(0) = 1L
  }

  private final case class PendingInc(s: StartState, level: Int, delta: Long)

  /** Combination snapshot taken when a segment START arrives (§3.3).
    * Intermediate levels keep per-START values; the final level only
    * needs, per window the START can fall into, the sum of combined
    * counts of overall STARTs inside that window — `w/slide` numbers per
    * START instead of one per overall START. This is what keeps
    * single-sided sharing's cost and memory quadratic-free at the final
    * level (the literal Eq 5: the triple product arises only between two
    * combination levels, i.e. when both a prefix and a suffix exist).
    */
  private sealed trait Snap { def stateUnits: Long }
  private final case class MapSnap(m: mutable.AnyRefMap[StartState, Long]) extends Snap {
    def stateUnits: Long = m.size.toLong + 1
  }
  /** `sums(i)` = Σ counts of overall STARTs `a` with
    * `a.time >= firstWs + i*slide`, for the windows containing the
    * segment START this snapshot belongs to.
    */
  private final case class WinSnap(firstWs: Long, sums: Array[Long]) extends Snap {
    def stateUnits: Long = sums.length.toLong + 1
  }

  /** A-Seq state for one segment pattern (§3.2); shared across queries
    * when the plan says so (one instance per distinct shareKey).
    */
  final class SegmentRuntime(val types: Vector[Int]) {
    private val levelOf: Map[Int, Int] = types.zipWithIndex.toMap
    val starts = mutable.ArrayBuffer.empty[StartState]
    private var pendingStarts = List.empty[StartState]
    private var pendingIncs   = List.empty[PendingInc]

    /** Phase 1: evaluate `e` against pre-batch state. Returns the newly
      * created START (not yet live) and the full-segment completions
      * `(start, delta)` ending at `e`.
      */
    def observe(e: Event): (Option[StartState], List[(StartState, Long)]) =
      levelOf.get(e.etype) match {
        case None => (None, Nil)
        case Some(0) =>
          val st = new StartState(e.time, types.size)
          pendingStarts ::= st
          metrics.countUpdates += 1
          metrics.addState(types.size.toLong)
          // A single-type segment completes at its own START event.
          val comps = if (types.size == 1) List((st, 1L)) else Nil
          (Some(st), comps)
        case Some(j) =>
          var comps = List.empty[(StartState, Long)]
          val last  = types.size - 1
          var i     = 0
          while (i < starts.size) {
            val s = starts(i)
            if (s.time < e.time) {
              metrics.countUpdates += 1
              val delta = s.counts(j - 1)
              if (delta > 0) {
                pendingIncs ::= PendingInc(s, j, delta)
                if (j == last) comps ::= ((s, delta))
              }
            }
            i += 1
          }
          (None, comps)
      }

    /** Phase 2: make the tie-batch's effects visible. */
    def commit(): Unit = {
      pendingStarts.foreach(starts += _)
      pendingStarts = Nil
      pendingIncs.foreach(p => p.s.counts(p.level) += p.delta)
      pendingIncs = Nil
    }

    /** Drop STARTs whose last containing window has closed (§3.2). Safe:
      * the window filter at result time already excludes them.
      */
    def expire(now: Long): Unit = {
      var i = 0
      while (i < starts.size) {
        if (win.lastWindowEnd(starts(i).time) <= now) {
          metrics.removeState(types.size.toLong)
          starts.remove(i)
        } else i += 1
      }
    }
  }

  /** Count-combination state of one query (§3.3). Level `j` corresponds
    * to the combined pattern `C_j = S_1..S_j`; `comb(j)` maps the overall
    * START `a` (a START of `S_1`) to the number of completed `C_{j+1}`
    * matches.
    */
  final class QueryRuntime(val q: CompiledQuery, val segs: Vector[SegmentRuntime]) {
    private val k = segs.size
    private val comb: Array[mutable.AnyRefMap[StartState, Long]] =
      Array.fill(k)(mutable.AnyRefMap.empty)
    // snaps(j): segment-j START c -> snapshot of comb(j-1) taken at c.
    private val snaps: Array[mutable.AnyRefMap[StartState, Snap]] =
      Array.fill(k)(mutable.AnyRefMap.empty)
    private var pendingComb = List.empty[(Int, StartState, Long)]
    val results = mutable.LongMap.empty[Long] // windowStart -> count

    /** Phase 1 for one event of the tie-batch. `segResults(segIdx(j))` is
      * segment `j`'s observe() result for this event (null when the
      * segment did not react).
      */
    def observe(e: Event,
                segResults: Array[(Option[StartState], List[(StartState, Long)])],
                segIdx: Vector[Int]): Unit = {
      def perSeg(j: Int): (Option[StartState], List[(StartState, Long)]) = {
        val r = segResults(segIdx(j))
        if (r == null) (None, Nil) else r
      }
      // 1. Snapshots at new STARTs of segments j >= 1 (Fig 7: "when c3
      //    arrives, count(A,B) = 1"). The *final* level stores the
      //    snapshot as a time-sorted cumulative array so completions can
      //    answer "combined count of STARTs >= window start" with one
      //    binary search instead of iterating every START — this is what
      //    keeps single-sided sharing quadratic (the literal Eq 5:
      //    the triple product only arises between two combination
      //    levels, i.e. with both a prefix and a suffix).
      var j = 1
      while (j < k) {
        perSeg(j)._1.foreach { c =>
          if (j == k - 1) {
            val wss     = win.windowsOf(c.time)
            val firstWs = wss.head
            val buckets = new Array[Long](wss.size)
            var touched = 0
            comb(j - 1).foreachEntry { (a, n) =>
              if (n > 0 && a.time >= firstWs) {
                touched += 1
                // `a` covers every window start <= a.time in range.
                val pos = math.min(buckets.length - 1,
                  ((a.time - firstWs) / win.slideSec).toInt)
                buckets(pos) += n
              }
            }
            // suffix-sum: sums(i) = Σ_{p >= i} buckets(p)
            var i = buckets.length - 2
            while (i >= 0) { buckets(i) += buckets(i + 1); i -= 1 }
            metrics.combMults += math.max(1, touched + buckets.length)
            metrics.addState(buckets.length.toLong + 1)
            snaps(j)(c) = WinSnap(firstWs, buckets)
          } else {
            val snap = mutable.AnyRefMap.empty[StartState, Long]
            comb(j - 1).foreachEntry { (a, n) => if (n > 0) snap(a) = n }
            metrics.combMults += math.max(1, snap.size)
            metrics.addState(snap.size.toLong + 1)
            snaps(j)(c) = MapSnap(snap)
          }
        }
        j += 1
      }
      // 2. Completions. Level 0 feeds comb(0) directly; level j >= 1
      //    multiplies against the snapshot taken at its START.
      // comb(k-1) is never read (the last level only feeds window
      // results), so it is not materialized.
      val windowDeltas = mutable.AnyRefMap.empty[StartState, Long]
      perSeg(0)._2.foreach { case (a, delta) =>
        if (k > 1) pendingComb ::= ((0, a, delta))
        else windowDeltas(a) = windowDeltas.getOrElse(a, 0L) + delta
      }
      j = 1
      while (j < k) {
        perSeg(j)._2.foreach { case (c, delta) =>
          snaps(j).get(c) match {
            case Some(MapSnap(snap)) => // intermediate level
              snap.foreachEntry { (a, pref) =>
                metrics.combMults += 1
                pendingComb ::= ((j, a, pref * delta))
              }
            case Some(WinSnap(firstWs, sums)) => // final level
              win.windowsOf(e.time).foreach { ws =>
                metrics.combMults += 1
                val idx = (ws - firstWs) / win.slideSec
                if (idx >= 0 && idx < sums.length) {
                  val sum = sums(idx.toInt) * delta
                  if (sum != 0) {
                    if (!results.contains(ws)) metrics.addState(1)
                    results(ws) = results.getOrElse(ws, 0L) + sum
                  }
                }
              }
            case None => ()
          }
        }
        j += 1
      }
      // 3. Window result updates at the query's END event (§3.2: "when an
      //    END event arrives, it updates the final counts for all windows
      //    it falls into"), filtered to STARTs inside the window. Only
      //    single-segment queries take this path; multi-segment queries
      //    update results through the final-level CumSnap above.
      if (windowDeltas.nonEmpty) {
        win.windowsOf(e.time).foreach { ws =>
          var sum = 0L
          // Same work unit as the shared path's per-(START, window)
          // combination lookups — metered so Non-Shared and Shared costs
          // are comparable.
          metrics.combMults += windowDeltas.size
          windowDeltas.foreachEntry { (a, d) => if (a.time >= ws) sum += d }
          if (sum != 0) {
            if (!results.contains(ws)) metrics.addState(1)
            results(ws) = results.getOrElse(ws, 0L) + sum
          }
        }
      }
    }

    def commit(): Unit = {
      pendingComb.foreach { case (j, a, inc) =>
        if (!comb(j).contains(a)) metrics.addState(1)
        comb(j)(a) = comb(j).getOrElse(a, 0L) + inc
      }
      pendingComb = Nil
    }

    def expire(now: Long): Unit = {
      comb.foreach { m =>
        val dead = m.keysIterator.filter(a => win.lastWindowEnd(a.time) <= now).toList
        dead.foreach { a => m.remove(a); metrics.removeState(1) }
      }
      snaps.foreach { m =>
        val dead = m.keysIterator.filter(c => win.lastWindowEnd(c.time) <= now).toList
        dead.foreach { c =>
          val snap = m.remove(c)
          metrics.removeState(snap.map(_.stateUnits).getOrElse(1L))
        }
      }
    }
  }

  // --- wiring: one runtime per distinct shareKey; queries reference them.
  private val segmentRuntimes: mutable.LinkedHashMap[String, SegmentRuntime] =
    mutable.LinkedHashMap.empty
  private val queryRuntimes: Vector[QueryRuntime] = cw.queries.map { cq =>
    val segs = cq.segments.map(s =>
      segmentRuntimes.getOrElseUpdate(s.shareKey, new SegmentRuntime(s.types)))
    new QueryRuntime(cq, segs)
  }
  private val segKeys = segmentRuntimes.keys.toVector
  private val segArr  = segKeys.map(segmentRuntimes).toArray
  // Per query: index of each of its segments into segKeys.
  private val querySegIdx: Vector[Vector[Int]] = cw.queries.map(
    _.segments.map(s => segKeys.indexOf(s.shareKey)))
  // Dispatch indexes: which segments / queries react to an event type.
  private val typeToSegs: Map[Int, Array[Int]] =
    segArr.zipWithIndex
      .flatMap { case (s, i) => s.types.map(_ -> i) }
      .groupBy(_._1).view.mapValues(_.map(_._2).distinct.sorted).toMap
  private val typeToQueries: Map[Int, Array[Int]] =
    cw.queries.indices
      .flatMap(qi => cw.queries(qi).segments.flatMap(_.types).distinct.map(_ -> qi))
      .groupBy(_._1).view.mapValues(_.map(_._2).distinct.sorted.toArray).toMap
  private val segResults =
    new Array[(Option[StartState], List[(StartState, Long)])](segArr.length)

  private var nextExpire = Long.MinValue

  private def processBatch(batch: List[Event]): Unit = {
    val events = batch.reverse // restore arrival order (cosmetic; ties commute)
    events.foreach { e =>
      metrics.events += 1
      // Phase 1a: each reacting segment runtime sees the event once —
      // this is the sharing: shared patterns are aggregated once (§3.3).
      val segs = typeToSegs.getOrElse(e.etype, null)
      if (segs != null) {
        var i = 0
        while (i < segs.length) { segResults(segs(i)) = segArr(segs(i)).observe(e); i += 1 }
        // Phase 1b: per-query combination against pre-batch combiner
        // state; only queries whose pattern contains the type react.
        val qs = typeToQueries(e.etype)
        i = 0
        while (i < qs.length) {
          queryRuntimes(qs(i)).observe(e, segResults, querySegIdx(qs(i))); i += 1
        }
        i = 0
        while (i < segs.length) { segResults(segs(i)) = null; i += 1 }
      }
      // NB: within a tie-batch each event's observe() reads only
      // pre-batch counts (commits below happen after the whole batch),
      // preserving the strict e_i.time < e_j.time sequence semantics.
    }
    segArr.foreach(_.commit())
    queryRuntimes.foreach(_.commit())
  }

  private var batch = List.empty[Event]
  private var lastTime = Long.MinValue

  /** Feeds one event; events must arrive in non-decreasing time order.
    * Same-timestamp events are buffered into a tie-batch that is flushed
    * when time advances (or at [[results]]/[[emitClosed]]).
    */
  def feed(e: Event): Unit = {
    require(e.time >= lastTime, "events must arrive in time order")
    if (e.time != lastTime && batch.nonEmpty) { processBatch(batch); batch = Nil }
    lastTime = e.time
    if (e.time >= nextExpire) {
      segmentRuntimes.valuesIterator.foreach(_.expire(e.time))
      queryRuntimes.foreach(_.expire(e.time))
      nextExpire = e.time + win.slideSec
    }
    batch ::= e
  }

  private def flush(): Unit =
    if (batch.nonEmpty) { processBatch(batch); batch = Nil }

  /** Current per-key window counts of every query (flushes pending ties). */
  def results(): Iterator[QueryWindowCount] = {
    flush()
    for {
      qr        <- queryRuntimes.iterator
      (ws, cnt) <- qr.results.iterator
    } yield QueryWindowCount(qr.q.id, ws, cnt)
  }

  /** Streaming emission: returns and forgets the counts of all windows
    * fully before `watermark` (their results can no longer change).
    */
  def emitClosed(watermark: Long): Vector[QueryWindowCount] = {
    flush()
    val out = Vector.newBuilder[QueryWindowCount]
    queryRuntimes.foreach { qr =>
      val closed = qr.results.keysIterator
        .filter(ws => ws + win.lengthSec <= watermark).toList
      closed.foreach { ws =>
        out += QueryWindowCount(qr.q.id, ws, qr.results(ws))
        qr.results.remove(ws)
        metrics.removeState(1)
      }
    }
    out.result()
  }

  /** Processes a complete, time-sorted key group and returns the per-key
    * window counts of every query.
    */
  def run(events: Iterator[Event]): Iterator[QueryWindowCount] = {
    events.foreach(feed)
    results()
  }
}

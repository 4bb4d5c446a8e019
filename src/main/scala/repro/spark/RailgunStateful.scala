package repro.spark

import org.apache.spark.sql.Dataset
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}

/** Per-key reservoir kept in Structured Streaming state: the window's
  * events, sorted by (ts, eventId). The full-event retention is the point —
  * accurate sliding windows cannot discard events (§2.2).
  */
final case class CardReservoir(events: List[(Long, Long, Double)]) // (ts, id, amount)

/** One accurate per-event answer. */
final case class SlidingAnswer(eventId: Long, ts: Long, cardId: String,
                               cnt: Long, sum: Double, avg: Double,
                               mx: Double, mn: Double)

/** Railgun's semantics as a *custom stateful operator* on Spark Structured
  * Streaming — the extension point named by the reproduction brief:
  * `flatMapGroupsWithState` holding a per-key event reservoir and emitting
  * one accurate sliding-window aggregate row per input event, instead of
  * the built-in `window()` hopping approximation.
  *
  * Late events (older than the reservoir's newest timestamp minus the
  * window) are still answered, from the state as-of their arrival —
  * matching Railgun's never-delay-the-answer stance (§4.1.1).
  */
object RailgunStateful {

  def slidingAggregates(ds: Dataset[Payment], windowMs: Long): Dataset[SlidingAnswer] = {
    import ds.sparkSession.implicits._
    ds.groupByKey(_.cardId)
      .flatMapGroupsWithState(OutputMode.Append, GroupStateTimeout.NoTimeout) {
        (cardId: String, incoming: Iterator[Payment], state: GroupState[CardReservoir]) =>
          var window = state.getOption.map(_.events).getOrElse(Nil)
          val batch = incoming.toVector.sortBy(p => (p.ts, p.eventId))
          val out = batch.map { p =>
            // insert (keeping (ts, id) order) then evict ts <= p.ts - windowMs
            window = insertSorted(window, (p.ts, p.eventId, p.amount))
              .dropWhile(_._1 <= p.ts - windowMs)
            val n = window.size
            val s = window.iterator.map(_._3).sum
            val mx = window.iterator.map(_._3).max
            val mn = window.iterator.map(_._3).min
            SlidingAnswer(p.eventId, p.ts, cardId, n, s, s / n, mx, mn)
          }
          state.update(CardReservoir(window))
          out.iterator
      }
  }

  private def insertSorted(window: List[(Long, Long, Double)],
                           e: (Long, Long, Double)): List[(Long, Long, Double)] = {
    // events almost always arrive in order: fast path appends at the end
    val inOrder = window.isEmpty || {
      val l = window.last
      l._1 < e._1 || (l._1 == e._1 && l._2 <= e._2)
    }
    if (inOrder) window :+ e
    else (window :+ e).sortBy(x => (x._1, x._2))
  }
}

package repro.stream

import scala.collection.mutable
import repro.core._

/** The stream substrate: turns a timestamp-ordered stream of spatial
  * objects into the interleaved `New` / `Grown` / `Expired` event sequence
  * of Section IV-C.
  *
  * For an object created at `t_c` with window length `|W|`:
  * the `New` event fires at `t_c`, the `Grown` event (current → past) at
  * `t_c + |W|`, and the `Expired` event at `t_c + 2|W|`. Pending transitions
  * are released before any arrival with an equal-or-later timestamp, so
  * every algorithm observes windows `W_c = (t−|W|, t]`,
  * `W_p = (t−2|W|, t−|W|]` exactly. At equal firing times, `Expired`
  * precedes `Grown` precedes `New`; ties beyond that break by insertion
  * order, making the sequence fully deterministic.
  */
object EventStream {

  private final case class Pending(due: Long, rank: Int, seq: Long, obj: SpatialObj, kind: EventKind)
  private val pendingOrd: Ordering[Pending] =
    Ordering.by((p: Pending) => (-p.due, -p.rank, -p.seq)) // max-heap → smallest (due, rank, seq) first

  /** Lazily interleave transitions with arrivals.
    *
    * @param objs      arrivals in non-decreasing `t` order
    * @param windowMillis window length `|W|`
    * @param drainTail whether to emit the Grown/Expired events that fall
    *                  after the last arrival (true = windows slide to empty)
    */
  def fromObjects(objs: Iterable[SpatialObj], windowMillis: Long,
                  drainTail: Boolean = true): Iterator[Event] = new Iterator[Event] {
    private val it  = objs.iterator
    private val pq  = mutable.PriorityQueue.empty[Pending](pendingOrd)
    private var seqNo = 0L
    private var nextArrival: Option[SpatialObj] = advance()

    private def advance(): Option[SpatialObj] = if (it.hasNext) Some(it.next()) else None

    def hasNext: Boolean = nextArrival.isDefined || (drainTail && pq.nonEmpty)

    def next(): Event = {
      nextArrival match {
        case Some(o) if pq.isEmpty || pq.head.due > o.t =>
          nextArrival = advance()
          seqNo += 1
          pq.enqueue(Pending(o.t + windowMillis, 1, seqNo, o, EventKind.Grown))
          pq.enqueue(Pending(o.t + 2 * windowMillis, 0, seqNo, o, EventKind.Expired))
          Event(o, EventKind.New, o.t)
        case _ =>
          val p = pq.dequeue()
          Event(p.obj, p.kind, p.due)
      }
    }
  }

  /** Count of events an N-object stream produces (3 per object when the
    * tail is drained).
    */
  def eventCount(n: Long, drainTail: Boolean = true): Long = if (drainTail) 3 * n else -1
}

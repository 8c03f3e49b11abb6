package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Upper-bound discipline of a [[CellCspot]] instance (Section VII-A):
  * `Full` = CCS (static Eqn 2 + dynamic Eqn 3 bounds, candidate reuse),
  * `StaticOnly` = B-CCS (static bound only, candidate reuse),
  * `NoBounds` = Base (search every affected cell on every event).
  */
sealed abstract class BoundMode
object BoundMode {
  case object Full       extends BoundMode
  case object StaticOnly extends BoundMode
  case object NoBounds   extends BoundMode
}

/** Search-cost counters for Table II and the runtime tables. */
final class CspotStats {
  var messages: Long = 0L
  var messagesWithSearch: Long = 0L
  var searches: Long = 0L
  var sweptRects: Long = 0L

  def reset(): Unit = { messages = 0; messagesWithSearch = 0; searches = 0; sweptRects = 0 }
  def searchRatio: Double =
    if (messages == 0) 0.0 else messagesWithSearch.toDouble / messages
}

/** Cell-CSPOT (Algorithm 2): exact continuous bursty-point detection.
  *
  * A grid of `b×a` cells (Definition 6) partitions the space. Each non-empty
  * cell keeps:
  *  - the rectangle objects overlapping it across `W_c ∪ W_p` (`c.G`),
  *  - the static upper bound `U_s` of Eqn 2, maintained incrementally,
  *  - the dynamic upper bound `U_d` of Eqn 3 (+∞ until the first search),
  *  - a candidate point (the last SL-CSPOT result) whose per-window scores
  *    are tracked incrementally and whose validity follows Lemma 4.
  *
  * A lazy max-heap orders cells by `U(c) = min(U_s, U_d)`. An event updates
  * the ≤4 affected cells in O(1) each; a query walks cells in descending
  * bound order, re-sweeping only cells whose candidate is invalid, and stops
  * as soon as no bound exceeds the best candidate score found — the lazy
  * update strategy of Section IV-C1.
  *
  * Exactness note: whenever a candidate stays valid under Lemma 4, its
  * tracked score gains exactly the increment applied to `U_d`, so for valid
  * candidates `U(c) = S(c.p)` and the first valid heap top is the answer.
  */
final class CellCspot(val cfg: SurgeConfig, val mode: BoundMode = BoundMode.Full,
                      externalPast: Option[Long => Boolean] = None) {
  import EventKind._

  private val grid  = new Grid(cfg.rectW, cfg.rectH)
  private val cells = mutable.HashMap.empty[(Long, Long), Cell]
  private val heap  = new LazyMaxHeap[(Long, Long)]

  // Window membership is *event-driven*: an object is Past from the moment
  // its Grown event is processed until its Expired event removes it. This
  // keeps searches consistent with the incrementally-tracked bounds and
  // candidates when several events share one firing timestamp. The top-k
  // orchestrator shares one membership oracle across its layers via
  // `externalPast` (layers never see events of rects invisible to them).
  private val pastIds = mutable.HashSet.empty[Long]
  private def isPast(id: Long): Boolean = externalPast match {
    case Some(f) => f(id)
    case None    => pastIds.contains(id)
  }
  private val winOf: SpatialObj => Win =
    o => if (isPast(o.id)) Win.Past else Win.Cur

  /** Wall-clock of the last processed event. */
  var now: Long = Long.MinValue

  val stats = new CspotStats
  private var searchedThisMessage = false

  private final class Cell(val key: (Long, Long)) {
    val rects = mutable.LinkedHashMap.empty[Long, SpatialObj]
    var us: Double = 0.0
    var ud: Double = Double.PositiveInfinity
    var cand: BurstyPoint = _
    var candValid: Boolean = false

    def bound: Double = mode match {
      case BoundMode.Full       => math.min(math.max(us, 0.0), ud)
      case BoundMode.StaticOnly => math.max(us, 0.0)
      case BoundMode.NoBounds   => if (cand == null) 0.0 else cand.score
    }
  }

  /** Number of live (non-empty) cells. */
  def cellCount: Int = cells.size

  /** All live rects covering `(px, py)` — used by the top-k extension to
    * compute cover sets through the cell index instead of a full scan.
    */
  def rectsCovering(px: Double, py: Double): Iterator[SpatialObj] =
    cells.get(grid.cellOf(px, py)) match {
      case None    => Iterator.empty
      case Some(c) => c.rects.valuesIterator.filter(o => cfg.rectBox(o).contains(px, py))
    }

  /** Process one event and report the current bursty point (Algorithm 2). */
  def onEvent(e: Event): Option[BurstyPoint] = {
    stats.messages += 1
    searchedThisMessage = false
    process(e)
    val r = query()
    if (searchedThisMessage) stats.messagesWithSearch += 1
    r
  }

  /** Apply an event's bound/candidate updates without querying — used when a
    * caller samples queries sparsely (the structures stay exact; searches
    * only happen inside `query()` except in `NoBounds` mode).
    */
  def process(e: Event): Unit = {
    now = e.at
    val o    = e.obj
    val obox = cfg.rectBox(o)
    val d    = cfg.delta(o.w)
    if (externalPast.isEmpty) e.kind match {
      case Grown   => pastIds += o.id
      case Expired => pastIds -= o.id
      case New     => ()
    }
    grid.cellsOverlapping(obox).foreach { key =>
      val c = e.kind match {
        case New => cells.getOrElseUpdate(key, new Cell(key))
        case _   => cells.getOrElse(key, null)
      }
      if (c != null) {
        e.kind match {
          case New     => c.rects.update(o.id, o); c.us += d; c.ud += d
          case Grown   => c.us -= d // Eqn 3: dynamic bound unchanged
          case Expired => c.rects.remove(o.id); c.ud += cfg.alpha * d
        }
        if (c.cand != null) {
          val covered = obox.contains(c.cand.x, c.cand.y)
          val pre     = c.cand.fc - c.cand.fp
          if (covered) {
            val (nfc, nfp) = e.kind match {
              case New     => (c.cand.fc + d, c.cand.fp)
              case Grown   => (c.cand.fc - d, c.cand.fp + d)
              case Expired => (c.cand.fc, c.cand.fp - d)
            }
            c.cand = BurstyPoint(c.cand.x, c.cand.y, nfc, nfp, cfg.burst(nfc, nfp))
          }
          if (c.candValid) {
            // Lemma 4 (conservative form, evaluated on pre-event scores).
            c.candValid = e.kind match {
              case New | Expired => covered && pre >= -1e-9
              case Grown         => !covered
            }
          }
        }
        finishCellUpdate(key, c)
      }
    }
  }

  /** Synthetic insert/remove used by the top-k extension (Section VI-B):
    * rectangle `o` becomes (in)visible to this instance while the clock
    * stands still. Bound and validity maintenance mirror the Lemma 3/4 case
    * analysis: inserting a current-window rect behaves like `New`, removing
    * a past-window rect behaves like `Expired`, and the two score-decreasing
    * cases leave the dynamic bound untouched.
    */
  def synthetic(o: SpatialObj, insert: Boolean): Unit = {
    val isCur = !isPast(o.id)
    val obox  = cfg.rectBox(o)
    val d     = cfg.delta(o.w)
    grid.cellsOverlapping(obox).foreach { key =>
      val c =
        if (insert) cells.getOrElseUpdate(key, new Cell(key))
        else cells.getOrElse(key, null)
      if (c != null) {
        if (insert) {
          c.rects.update(o.id, o)
          if (isCur) { c.us += d; c.ud += d }
        } else {
          c.rects.remove(o.id)
          if (isCur) c.us -= d
          else c.ud += cfg.alpha * d
        }
        if (c.cand != null) {
          val covered = obox.contains(c.cand.x, c.cand.y)
          val pre     = c.cand.fc - c.cand.fp
          if (covered) {
            val (nfc, nfp) = (insert, isCur) match {
              case (true, true)   => (c.cand.fc + d, c.cand.fp)
              case (true, false)  => (c.cand.fc, c.cand.fp + d)
              case (false, true)  => (c.cand.fc - d, c.cand.fp)
              case (false, false) => (c.cand.fc, c.cand.fp - d)
            }
            c.cand = BurstyPoint(c.cand.x, c.cand.y, nfc, nfp, cfg.burst(nfc, nfp))
          }
          if (c.candValid) {
            c.candValid = (insert, isCur) match {
              case (true, true)   => covered && pre >= -1e-9 // like New
              case (false, false) => covered && pre >= -1e-9 // like Expired
              case _              => !covered                // score-decreasing cases
            }
          }
        }
        finishCellUpdate(key, c)
      }
    }
  }

  private def finishCellUpdate(key: (Long, Long), c: Cell): Unit = {
    if (c.rects.isEmpty) {
      cells.remove(key)
      heap.remove(key)
    } else mode match {
      case BoundMode.NoBounds =>
        searchCell(c)
        heap.update(key, c.bound)
      case _ =>
        heap.update(key, c.bound)
    }
  }

  private def searchCell(c: Cell): Unit = {
    val res = SweepLine.burstyPoint(c.rects.values, grid.cellBox(c.key), cfg, winOf)
    stats.searches += 1
    stats.sweptRects += res.rectCount
    searchedThisMessage = true
    c.cand = res.point.getOrElse {
      val b = grid.cellBox(c.key)
      BurstyPoint(b.x0, b.y0, 0.0, 0.0, 0.0)
    }
    c.candValid = true
    if (mode == BoundMode.Full) c.ud = c.cand.score
  }

  /** Current bursty point (the lazy-update search loop of Algorithm 2).
    * Idempotent; may be called as often or as rarely as the caller likes.
    */
  def query(): Option[BurstyPoint] = {
    if (mode == BoundMode.NoBounds)
      return heap.peekMax.map { case (k, _) => cells(k).cand }
    var best: BurstyPoint = null
    val stash = ArrayBuffer.empty[(Long, Long)]
    var done  = false
    while (!done) {
      heap.peekMax match {
        case None => done = true
        case Some((k, u)) =>
          if (best != null && u <= best.score + 1e-9) done = true
          else {
            val c = cells(k)
            if (!c.candValid) {
              searchCell(c)
              heap.update(k, c.bound)
            } else {
              if (best == null || c.cand.score > best.score) best = c.cand
              heap.popMax
              stash += k
            }
          }
      }
    }
    stash.foreach(k => cells.get(k).foreach(c => heap.update(k, c.bound)))
    Option(best)
  }
}

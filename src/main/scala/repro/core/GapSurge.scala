package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** One grid cell reported as an approximate bursty region. */
final case class CellResult(key: (Long, Long), box: Box, fc: Double, fp: Double, score: Double)

/** GAP-SURGE (Algorithm 3): grid-based approximate SURGE.
  *
  * The space is divided into `b×a` cells anchored at `(offX, offY)`; every
  * cell is a candidate region. Events update the containing cell's
  * per-window scores in O(1); a lazy max-heap reports the cell with the
  * maximum burst score in `O(log n)`. Approximation ratio `(1−α)/4`
  * (Theorem 3; the ratio is tight by Lemma 7).
  *
  * Note: Algorithm 3 in the paper prints the burst score without the `α`
  * weights — an obvious typo; we score cells with Definition 1 via
  * [[SurgeConfig.burst]].
  */
final class GapSurge(val cfg: SurgeConfig, val offX: Double = 0.0, val offY: Double = 0.0) {
  import EventKind._

  private val grid  = new Grid(cfg.rectW, cfg.rectH, offX, offY)
  private val cells = mutable.HashMap.empty[(Long, Long), CState]
  private val heap  = new LazyMaxHeap[(Long, Long)]

  private final class CState {
    var fc: Double = 0.0
    var fp: Double = 0.0
    var live: Int  = 0 // objects of this cell still inside W_c ∪ W_p
  }

  def cellCount: Int = cells.size

  /** Apply one event (O(1) + heap update). */
  def process(e: Event): Unit = {
    val o   = e.obj
    val d   = cfg.delta(o.w)
    val key = grid.cellOf(o.x, o.y)
    val c   = cells.getOrElseUpdate(key, new CState)
    e.kind match {
      case New     => c.fc += d; c.live += 1
      case Grown   => c.fc -= d; c.fp += d
      case Expired => c.fp -= d; c.live -= 1
    }
    if (c.live == 0) { cells.remove(key); heap.remove(key) }
    else heap.update(key, cfg.burst(c.fc, c.fp))
  }

  def onEvent(e: Event): Option[CellResult] = { process(e); top }

  /** The cell with the maximum burst score (line 6 of Algorithm 3). */
  def top: Option[CellResult] =
    heap.peekMax.map { case (k, _) => result(k) }

  /** Top-k cells by burst score (GAP-KSURGE, Algorithm 6). Cells of a single
    * grid are disjoint, so the top-k list is non-overlapping by construction.
    */
  def topK(k: Int): IndexedSeq[CellResult] = {
    val popped = ArrayBuffer.empty[((Long, Long), Double)]
    while (popped.length < k && heap.peekMax.isDefined)
      heap.popMax.foreach(popped += _)
    // restore
    popped.foreach { case (key, p) => heap.update(key, p) }
    popped.iterator.map { case (key, _) => result(key) }.toIndexedSeq
  }

  private def result(k: (Long, Long)): CellResult = {
    val c = cells(k)
    CellResult(k, grid.cellBox(k), c.fc, c.fp, cfg.burst(c.fc, c.fp))
  }
}

/** MGAP-SURGE (Algorithm 5): four half-cell-shifted grids —
  * `(0,0), (b/2,0), (0,a/2), (b/2,a/2)` per Section V-B — each running
  * GAP-SURGE; the best of the four answers is reported. Approximation ratio
  * remains `(1−α)/4` (Theorem 4) but is much better in practice.
  */
final class MGapSurge(val cfg: SurgeConfig) {
  val grids: IndexedSeq[GapSurge] = IndexedSeq(
    new GapSurge(cfg, 0.0, 0.0),
    new GapSurge(cfg, cfg.rectW / 2, 0.0),
    new GapSurge(cfg, 0.0, cfg.rectH / 2),
    new GapSurge(cfg, cfg.rectW / 2, cfg.rectH / 2),
  )

  def process(e: Event): Unit = grids.foreach(_.process(e))

  def onEvent(e: Event): Option[CellResult] = { process(e); top }

  /** Best region among the four grids' top cells. */
  def top: Option[CellResult] = {
    val tops = grids.flatMap(_.top)
    if (tops.isEmpty) None else Some(tops.maxBy(_.score))
  }

  /** MGAP-KSURGE (Algorithm 7): take the top-4k cells of each grid, merge
    * the ≤16k candidates, and greedily keep the top-k pairwise
    * non-overlapping ones (cells from different grids may overlap).
    */
  def topK(k: Int): IndexedSeq[CellResult] = {
    val merged = grids.flatMap(_.topK(4 * k)).sortBy(-_.score)
    val out    = ArrayBuffer.empty[CellResult]
    merged.foreach { c =>
      if (out.length < k && !out.exists(_.box.overlapsOpen(c.box))) out += c
    }
    out.toIndexedSeq
  }
}

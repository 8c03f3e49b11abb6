package repro.core.topk

import repro.core._

/** GAP-KSURGE (Algorithm 6): the grid-based approximation already maintains
  * every cell in a heap, so the top-k bursty regions are simply the top-k
  * cells by burst score; `O(log n + k)` per event.
  */
final class KGapSurge(val cfg: SurgeConfig, val k: Int) {
  require(k >= 1)
  private val gaps = new GapSurge(cfg)

  def process(e: Event): Unit = gaps.process(e)
  def onEvent(e: Event): IndexedSeq[CellResult] = { gaps.process(e); current }
  def current: IndexedSeq[CellResult] = gaps.topK(k)
}

/** MGAP-KSURGE (Algorithm 7): each of the four shifted grids contributes its
  * top-4k cells (a cell of one grid overlaps ≤4 cells of another); the ≤16k
  * candidates are merged and the top-k non-overlapping ones are reported.
  */
final class KMGapSurge(val cfg: SurgeConfig, val k: Int) {
  require(k >= 1)
  private val mgaps = new MGapSurge(cfg)

  def process(e: Event): Unit = mgaps.process(e)
  def onEvent(e: Event): IndexedSeq[CellResult] = { mgaps.process(e); current }
  def current: IndexedSeq[CellResult] = mgaps.topK(k)
}

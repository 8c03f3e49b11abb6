package repro.core

import scala.collection.mutable.ArrayBuffer

/** SL-CSPOT (Algorithm 1): exact bursty-point search on a snapshot.
  *
  * Given the rectangle objects alive in `W_c ∪ W_p` at time `now`, find a
  * point inside `box` maximising the burst score. The burst-score field is
  * piecewise constant over the disjoint regions induced by rectangle edges
  * (Theorem 2). With closed rectangles the candidate set must represent
  * every *face, edge and vertex* of that arrangement — not just
  * left-edge×top-edge corners: past-window rectangles contribute
  * negatively, so the maximum can sit strictly inside a face (sliding a
  * point onto an edge may acquire a past rect and lower its score), while
  * touching current rectangles make edge loci strictly better than both
  * adjacent faces. We therefore use, per axis, every clipped edge
  * coordinate plus the midpoint of each pair of consecutive coordinates;
  * coverage is axis-wise constant between consecutive edge coordinates, so
  * this hits every distinct score class. Points covered by nothing score 0
  * and every candidate scores ≥ 0, so they need no representative.
  *
  * The implementation sweeps a horizontal line top-down over the candidate
  * ys; per-interval `f_c`/`f_p` accumulators over the candidate xs are
  * updated by range-add when the line passes a rectangle's top edge and
  * range-subtract once it moves strictly below its bottom edge. `O(n²)` per
  * invocation, matching the paper's analysis of Algorithm 1.
  */
object SweepLine {

  /** Result of one sweep: the best point (None iff no live rect intersects
    * `box`) and the number of rectangles actually swept (the paper's
    * `|c|` — used for search-cost accounting).
    */
  final case class SweepResult(point: Option[BurstyPoint], rectCount: Int)

  /** Sorted distinct values plus the midpoint of each consecutive pair. */
  private def withMidpoints(raw: Array[Double]): Array[Double] = {
    val edges = raw.distinct.sorted
    if (edges.length <= 1) edges
    else {
      val out = new Array[Double](2 * edges.length - 1)
      var i = 0
      while (i < edges.length) {
        out(2 * i) = edges(i)
        if (i + 1 < edges.length) out(2 * i + 1) = (edges(i) + edges(i + 1)) / 2
        i += 1
      }
      out
    }
  }

  /** Wall-clock classification (snapshot semantics): windows derived from
    * `now` via [[Win.of]]. The continuous structures instead pass an explicit
    * event-driven classifier — see the other overload — because mid-batch
    * (several events sharing one firing timestamp) their incremental state
    * transitions membership at event-processing time, not wall-clock time.
    */
  def burstyPoint(all: Iterable[SpatialObj], box: Box, now: Long, cfg: SurgeConfig): SweepResult =
    burstyPoint(all, box, cfg, o => Win.of(o.t, now, cfg.windowMillis))

  def burstyPoint(all: Iterable[SpatialObj], box: Box, cfg: SurgeConfig,
                  winOf: SpatialObj => Win): SweepResult = {
    // Live rectangles intersecting the search box, tagged with their window.
    val objs  = new ArrayBuffer[SpatialObj]()
    val isCur = new ArrayBuffer[Boolean]()
    all.foreach { o =>
      winOf(o) match {
        case Win.Out => ()
        case w =>
          if (cfg.rectBox(o).intersectsClosed(box)) { objs += o; isCur += (w == Win.Cur) }
      }
    }
    val n = objs.length
    if (n == 0) return SweepResult(None, 0)

    // Candidate xs: clipped vertical edges + midpoints (face/edge/vertex reps).
    val rawXs = new Array[Double](2 * n)
    var i = 0
    while (i < n) {
      rawXs(2 * i) = math.max(objs(i).x, box.x0)
      rawXs(2 * i + 1) = math.min(objs(i).x + cfg.rectW, box.x1)
      i += 1
    }
    val xs = withMidpoints(rawXs)
    val m  = xs.length
    val fc = new Array[Double](m)
    val fp = new Array[Double](m)

    // Candidate ys: clipped horizontal edges + midpoints, descending.
    val rawYs = new Array[Double](2 * n)
    i = 0
    while (i < n) {
      rawYs(2 * i) = math.min(objs(i).y + cfg.rectH, box.y1)
      rawYs(2 * i + 1) = math.max(objs(i).y, box.y0)
      i += 1
    }
    val ys = withMidpoints(rawYs).reverse

    // Sweep order: rect indices by top edge (descending) for activation and
    // by bottom edge (descending) for deactivation.
    val idx   = Array.range(0, n)
    val byTop = idx.sortBy(i => -(objs(i).y + cfg.rectH))
    val byBot = idx.sortBy(i => -objs(i).y)

    // first index with xs(i) >= x
    def lowerBound(x: Double): Int = {
      var lo = 0; var hi = m
      while (lo < hi) { val mid = (lo + hi) >>> 1; if (xs(mid) >= x) hi = mid else lo = mid + 1 }
      lo
    }
    // last index with xs(i) <= x (may be -1)
    def upperBound(x: Double): Int = {
      var lo = -1; var hi = m - 1
      while (lo < hi) { val mid = (lo + hi + 1) >>> 1; if (xs(mid) <= x) lo = mid else hi = mid - 1 }
      lo
    }

    def applyRect(r: Int, sign: Int): Unit = {
      val o  = objs(r)
      val d  = sign * cfg.delta(o.w)
      val lo = lowerBound(o.x)
      val hi = upperBound(o.x + cfg.rectW)
      var j  = lo
      if (isCur(r)) while (j <= hi) { fc(j) += d; j += 1 }
      else while (j <= hi) { fp(j) += d; j += 1 }
    }

    var ai = 0 // activation cursor into byTop
    var ri = 0 // removal cursor into byBot
    var best: BurstyPoint = null
    var yi = 0
    while (yi < ys.length) {
      val y = ys(yi)
      // Activate rects whose top edge is at or above the line (closed cover).
      while (ai < n && objs(byTop(ai)).y + cfg.rectH >= y) { applyRect(byTop(ai), +1); ai += 1 }
      // Deactivate rects entirely above the line (bottom edge still covers).
      while (ri < n && objs(byBot(ri)).y > y) { applyRect(byBot(ri), -1); ri += 1 }
      var j = 0
      while (j < m) {
        val s = cfg.burst(fc(j), fp(j))
        if (best == null || s > best.score + 1e-12)
          best = BurstyPoint(xs(j), y, fc(j), fp(j), s)
        j += 1
      }
      yi += 1
    }
    SweepResult(Option(best), n)
  }
}

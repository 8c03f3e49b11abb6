package repro.core

import scala.collection.mutable.ArrayBuffer

/** Reference solvers used as correctness oracles in tests and as the
  * "naive" comparators of Sections IV-C and VI (recompute-from-scratch per
  * event). Deliberately simple — `O(n³)` per snapshot — and written
  * independently from the optimised structures they validate.
  */
object BruteForce {

  /** `(f_c, f_p)` of point `(px, py)` under `rects` at time `now`. */
  def scoreAt(rects: Iterable[SpatialObj], now: Long, cfg: SurgeConfig,
              px: Double, py: Double): BurstyPoint = {
    var fc = 0.0; var fp = 0.0
    rects.foreach { o =>
      if (cfg.rectBox(o).contains(px, py)) {
        Win.of(o.t, now, cfg.windowMillis) match {
          case Win.Cur  => fc += cfg.delta(o.w)
          case Win.Past => fp += cfg.delta(o.w)
          case Win.Out  => ()
        }
      }
    }
    BurstyPoint(px, py, fc, fp, cfg.burst(fc, fp))
  }

  /** Sorted distinct values plus the midpoint of each consecutive pair —
    * a representative of every face/edge/vertex class along one axis.
    */
  private def withMidpoints(raw: Seq[Double]): IndexedSeq[Double] = {
    val edges = raw.distinct.sorted.toIndexedSeq
    edges ++ edges.sliding(2).collect { case Seq(a, b) => (a + b) / 2 }
  }

  /** Exact bursty point over `rects` at time `now`, optionally restricted to
    * `box`. Enumerates a representative of every face, edge and vertex of
    * the edge arrangement (clipped edge coordinates plus midpoints between
    * consecutive ones — see the semantics note on [[SweepLine]]);
    * deterministic lexicographic tie-break.
    */
  def burstyPoint(rects: Iterable[SpatialObj], now: Long, cfg: SurgeConfig,
                  box: Option[Box] = None): Option[BurstyPoint] = {
    val live = rects.filter { o =>
      Win.of(o.t, now, cfg.windowMillis) != Win.Out &&
        box.forall(b => cfg.rectBox(o).intersectsClosed(b))
    }.toIndexedSeq
    if (live.isEmpty) return None
    val xs = withMidpoints(live.flatMap(o => Seq(
      box.fold(o.x)(b => math.max(o.x, b.x0)),
      box.fold(o.x + cfg.rectW)(b => math.min(o.x + cfg.rectW, b.x1)),
    )))
    val ys = withMidpoints(live.flatMap(o => Seq(
      box.fold(o.y + cfg.rectH)(b => math.min(o.y + cfg.rectH, b.y1)),
      box.fold(o.y)(b => math.max(o.y, b.y0)),
    )))
    var best: BurstyPoint = null
    for (y <- ys; x <- xs) {
      val p = scoreAt(live, now, cfg, x, y)
      if (best == null || p.score > best.score + 1e-12 ||
          (math.abs(p.score - best.score) <= 1e-12 &&
            (p.x < best.x || (p.x == best.x && p.y < best.y))))
        best = p
    }
    Option(best)
  }

  /** Ids of all live rects (current or past window) covering `(px, py)`. */
  def coverIds(rects: Iterable[SpatialObj], now: Long, cfg: SurgeConfig,
               px: Double, py: Double): Set[Long] =
    rects.iterator.filter { o =>
      Win.of(o.t, now, cfg.windowMillis) != Win.Out && cfg.rectBox(o).contains(px, py)
    }.map(_.id).toSet

  /** Greedy top-k bursty points per Definition 9: the i-th point maximises
    * the burst score over the rects not covering any earlier point.
    */
  def topK(rects: Iterable[SpatialObj], now: Long, cfg: SurgeConfig,
           k: Int): IndexedSeq[Option[BurstyPoint]] = {
    var remaining = rects.filter(o => Win.of(o.t, now, cfg.windowMillis) != Win.Out).toIndexedSeq
    val out = ArrayBuffer.empty[Option[BurstyPoint]]
    for (_ <- 1 to k) {
      val p = burstyPoint(remaining, now, cfg)
      out += p
      p.foreach { bp =>
        remaining = remaining.filterNot(o => cfg.rectBox(o).contains(bp.x, bp.y))
      }
    }
    out.toIndexedSeq
  }
}

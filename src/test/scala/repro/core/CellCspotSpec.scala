package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGen
import repro.exp.Tables.LiveSet
import repro.stream.EventStream

/** Replay validation of the continuous exact solutions: after *every* event
  * of randomized streams the reported burst score must equal the brute-force
  * snapshot optimum (Section IV-C correctness), in all three bound modes.
  */
class CellCspotSpec extends AnyFunSuite {

  private def replay(objs: IndexedSeq[SpatialObj], cfg: SurgeConfig, mode: BoundMode): Unit = {
    val algo = new CellCspot(cfg, mode)
    val live = new LiveSet(cfg.windowMillis)
    EventStream.fromObjects(objs, cfg.windowMillis).foreach { e =>
      live(e)
      val got = algo.onEvent(e)
      val exp = BruteForce.burstyPoint(live.objectsAt(e.at), e.at, cfg)
      (got, exp) match {
        case (None, None) => ()
        case (Some(g), Some(b)) =>
          assert(math.abs(g.score - b.score) < 1e-6,
                 s"$mode at ${e.kind}@${e.at}: got ${g.score}, brute ${b.score}")
          // the reported point's tracked scores are the true scores there
          val chk = BruteForce.scoreAt(live.objectsAt(e.at), e.at, cfg, g.x, g.y)
          assert(math.abs(chk.score - g.score) < 1e-6, s"$mode: stale candidate $g vs $chk")
        case (g, b) => fail(s"$mode: presence mismatch got=$g brute=$b at ${e.kind}@${e.at}")
      }
    }
  }

  for (mode <- Seq(BoundMode.Full, BoundMode.StaticOnly, BoundMode.NoBounds); seed <- 0 until 12)
    test(s"$mode matches brute force after every event (uniform), seed $seed") {
      val cfg = TestGen.cfg(windowMillis = 1000L, alpha = (seed % 10) / 10.0)
      replay(TestGen.stream(seed, 40), cfg, mode)
    }

  for (mode <- Seq(BoundMode.Full, BoundMode.StaticOnly, BoundMode.NoBounds); seed <- 0 until 8)
    test(s"$mode matches brute force after every event (clustered), seed $seed") {
      val cfg = TestGen.cfg(windowMillis = 1200L, alpha = 0.5)
      replay(TestGen.clusteredStream(seed, 45), cfg, mode)
    }

  for (seed <- 0 until 6)
    test(s"non-unit rectangle sizes, seed $seed") {
      val cfg = TestGen.cfg(windowMillis = 1000L, alpha = 0.5, rectW = 1.7, rectH = 0.6)
      replay(TestGen.stream(seed, 35), cfg, BoundMode.Full)
    }

  test("Theorem 1: region with top-right corner at the bursty point scores the same") {
    val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = 0.5)
    val objs = TestGen.stream(3, 40)
    val algo = new CellCspot(cfg, BoundMode.Full)
    val live = new LiveSet(cfg.windowMillis)
    EventStream.fromObjects(objs, cfg.windowMillis).foreach { e =>
      live(e)
      algo.onEvent(e).foreach { p =>
        val region = cfg.regionOf(p.x, p.y)
        var fc = 0.0; var fp = 0.0
        live.objectsAt(e.at).foreach { o =>
          if (region.contains(o.x, o.y)) Win.of(o.t, e.at, cfg.windowMillis) match {
            case Win.Cur  => fc += cfg.delta(o.w)
            case Win.Past => fp += cfg.delta(o.w)
            case Win.Out  => ()
          }
        }
        assert(math.abs(cfg.burst(fc, fp) - p.score) < 1e-6)
      }
    }
  }

  test("CCS triggers far fewer searches than B-CCS on a clustered stream") {
    val cfg  = TestGen.cfg(windowMillis = 1500L, alpha = 0.5)
    val objs = TestGen.clusteredStream(11, 300)
    val ccs  = new CellCspot(cfg, BoundMode.Full)
    val bccs = new CellCspot(cfg, BoundMode.StaticOnly)
    EventStream.fromObjects(objs, cfg.windowMillis).foreach { e =>
      ccs.onEvent(e); bccs.onEvent(e)
    }
    assert(ccs.stats.messages == bccs.stats.messages)
    assert(ccs.stats.searches < bccs.stats.searches,
           s"ccs=${ccs.stats.searches} bccs=${bccs.stats.searches}")
  }

  test("empty structure reports no bursty point and survives queries") {
    val algo = new CellCspot(TestGen.cfg(), BoundMode.Full)
    assert(algo.query().isEmpty)
  }

  test("structure drains to empty after all objects expire") {
    val cfg  = TestGen.cfg(windowMillis = 100L)
    val algo = new CellCspot(cfg, BoundMode.Full)
    val objs = TestGen.stream(5, 20, span = 300L)
    EventStream.fromObjects(objs, cfg.windowMillis).foreach(algo.onEvent)
    assert(algo.cellCount == 0)
    assert(algo.query().isEmpty)
  }

  test("rectsCovering finds exactly the covering live rects") {
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val objs = TestGen.stream(7, 30)
    val algo = new CellCspot(cfg, BoundMode.Full)
    val live = new LiveSet(cfg.windowMillis)
    var checked = 0
    EventStream.fromObjects(objs, cfg.windowMillis).foreach { e =>
      live(e); algo.onEvent(e)
      val p = (e.obj.x + 0.1, e.obj.y + 0.1)
      val got = algo.rectsCovering(p._1, p._2).map(_.id).toSet
      val exp = BruteForce.coverIds(live.objectsAt(e.at), e.at, cfg, p._1, p._2)
      assert(got == exp); checked += 1
    }
    assert(checked > 0)
  }
}

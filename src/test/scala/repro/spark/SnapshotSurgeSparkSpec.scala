package repro.spark

import repro.{SparkSpec, TestGen}
import repro.core._
import repro.data.SpatialStreams

/** The distributed exact snapshot solver must agree with the sequential
  * brute-force oracle — same closed-rectangle semantics, same scores.
  */
class SnapshotSurgeSparkSpec extends SparkSpec {

  for (seed <- 0 until 5)
    test(s"distributed bursty point equals brute force, seed $seed") {
      val now  = 20000L
      val cfg  = TestGen.cfg(
        windowMillis = 1000L, alpha = (seed % 10) / 10.0,
        rectW = 0.8 + 0.1 * seed, rectH = 1.1)
      val objs = TestGen.snapshot(seed, 120, now, cfg.windowMillis)
      val df   = SpatialStreams.toDF(spark, objs)
      val got  = SnapshotSurgeSpark.burstyPoint(df, cfg, now).map(_.score).getOrElse(0.0)
      val exp  = BruteForce.burstyPoint(objs, now, cfg).map(_.score).getOrElse(0.0)
      assert(math.abs(got - exp) < 1e-6, s"spark=$got brute=$exp")
    }

  test("per-cell results are self-consistent with raw scores") {
    val now  = 20000L
    val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = 0.5)
    val objs = TestGen.snapshot(42, 150, now, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs)
    val cells = SnapshotSurgeSpark.cellBursts(df, cfg, now).collect()
    assert(cells.nonEmpty)
    cells.foreach { c =>
      val chk = BruteForce.scoreAt(objs, now, cfg, c.x, c.y)
      assert(math.abs(chk.score - c.score) < 1e-6, s"cell $c vs $chk")
    }
  }

  test("an expired snapshot yields no bursty point") {
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val objs = TestGen.snapshot(1, 50, 20000L, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs)
    assert(SnapshotSurgeSpark.burstyPoint(df, cfg, now = 99000000L).isEmpty)
  }
}

package repro.spark

import repro.{Oracle, SparkSpec, TestGen}
import repro.core._
import repro.data.SpatialStreams

/** The Catalyst formulation of the grid burst aggregation must agree with
  * (a) the DuckDB oracle over independently written SQL and (b) the
  * driver-side GAP-SURGE structure.
  */
class GridBurstBatchSpec extends SparkSpec {

  private def oracleSql(cfg: SurgeConfig, now: Long, offX: Double, offY: Double): String = {
    val w = cfg.windowMillis
    s"""
       |SELECT cx, cy, fc, fp,
       |       ${cfg.alpha} * greatest(fc - fp, 0) + ${1 - cfg.alpha} * fc AS score
       |FROM (
       |  SELECT CAST(floor((CAST(x AS DOUBLE) - $offX) / ${cfg.rectW}) AS BIGINT) AS cx,
       |         CAST(floor((CAST(y AS DOUBLE) - $offY) / ${cfg.rectH}) AS BIGINT) AS cy,
       |         sum(CASE WHEN CAST(t AS BIGINT) > ${now - w} AND CAST(t AS BIGINT) <= $now
       |                  THEN CAST(w AS DOUBLE) ELSE 0 END) / ${cfg.windowNorm} AS fc,
       |         sum(CASE WHEN CAST(t AS BIGINT) > ${now - 2 * w} AND CAST(t AS BIGINT) <= ${now - w}
       |                  THEN CAST(w AS DOUBLE) ELSE 0 END) / ${cfg.windowNorm} AS fp
       |  FROM pts
       |  WHERE CAST(t AS BIGINT) > ${now - 2 * w} AND CAST(t AS BIGINT) <= $now
       |  GROUP BY cx, cy
       |)
       |""".stripMargin
  }

  for (seed <- 0 until 4)
    test(s"cellScores matches the DuckDB oracle, seed $seed") {
      val now  = 20000L
      val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = 0.3 + 0.1 * seed)
      val objs = TestGen.snapshot(seed, 300, now, cfg.windowMillis)
      val df   = SpatialStreams.toDF(spark, objs).select("w", "x", "y", "t")
      val got  = GridBurstBatch.cellScores(df, cfg, now)
      Oracle.assertEquivalent(got, oracleSql(cfg, now, 0, 0), "pts" -> df)
    }

  test("cellScores with shifted grid matches the DuckDB oracle") {
    val now  = 20000L
    val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = 0.5)
    val objs = TestGen.snapshot(11, 250, now, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs).select("w", "x", "y", "t")
    val got  = GridBurstBatch.cellScores(df, cfg, now, offX = 0.5, offY = 0.5)
    Oracle.assertEquivalent(got, oracleSql(cfg, now, 0.5, 0.5), "pts" -> df)
  }

  test("cellScores agrees with the driver-side GAP-SURGE at a snapshot") {
    val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = 0.5)
    val objs = TestGen.stream(5, 200)
    // replay the driver structure up to the last arrival
    val gaps = new GapSurge(cfg)
    var now  = 0L
    repro.stream.EventStream.fromObjects(objs, cfg.windowMillis, drainTail = false).foreach { e =>
      gaps.process(e); now = e.at
    }
    val df  = SpatialStreams.toDF(spark, objs).select("w", "x", "y", "t")
    val top = GridBurstBatch
      .topKCells(df, cfg, now, 1)
      .collect()
    val expected = gaps.top.map(_.score).getOrElse(0.0)
    assert(top.nonEmpty)
    assert(math.abs(top.head.getAs[Double]("score") - expected) < 1e-6)
  }

  test("topKCells returns k rows in descending score order") {
    val now  = 20000L
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val objs = TestGen.snapshot(7, 300, now, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs)
    val rows = GridBurstBatch.topKCells(df, cfg, now, 5).collect()
    assert(rows.length == 5)
    rows.map(_.getAs[Double]("score")).sliding(2).foreach {
      case Array(a, b) => assert(a >= b)
      case _           => ()
    }
  }

  test("multiGridTop returns one row per grid and dominates the unshifted grid") {
    val now  = 20000L
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val objs = TestGen.snapshot(9, 300, now, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs)
    val rows = GridBurstBatch.multiGridTop(df, cfg, now).collect()
    assert(rows.map(_.getAs[Int]("grid")).toSet == Set(0, 1, 2, 3))
    val g0   = rows.find(_.getAs[Int]("grid") == 0).get.getAs[Double]("score")
    val best = rows.map(_.getAs[Double]("score")).max
    assert(best >= g0)
  }

  test("empty window range yields an empty result") {
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val objs = TestGen.snapshot(3, 100, 20000L, cfg.windowMillis)
    val df   = SpatialStreams.toDF(spark, objs)
    assert(GridBurstBatch.cellScores(df, cfg, now = 99000000L).count() == 0)
  }
}

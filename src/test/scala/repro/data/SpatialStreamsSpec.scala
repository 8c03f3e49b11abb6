package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SpatialStreams._

class SpatialStreamsSpec extends AnyFunSuite {

  for (spec <- SpatialStreams.all) {
    test(s"${spec.name}: generation is deterministic") {
      assert(generate(spec, 2000) == generate(spec, 2000))
    }

    test(s"${spec.name}: positions stay inside the Table I bounding box") {
      val objs = generate(spec, 3000)
      objs.foreach { o =>
        assert(o.x >= spec.lonMin && o.x <= spec.lonMax, s"x out of range: $o")
        assert(o.y >= spec.latMin && o.y <= spec.latMax, s"y out of range: $o")
      }
    }

    test(s"${spec.name}: timestamps are non-decreasing over the paper duration") {
      val objs = generate(spec, 3000)
      objs.sliding(2).foreach {
        case Seq(a, b) => assert(a.t <= b.t)
        case _         => ()
      }
      val span = objs.last.t - objs.head.t
      assert(math.abs(span - spec.durationMillis).toDouble / spec.durationMillis < 0.01)
    }

    test(s"${spec.name}: weights are uniform integers in [1,100]") {
      val objs = generate(spec, 3000)
      objs.foreach { o =>
        assert(o.w >= 1.0 && o.w <= 100.0 && o.w == math.rint(o.w))
      }
      assert(objs.map(_.w).distinct.size > 50)
    }

    test(s"${spec.name}: ids are unique and sequential") {
      val objs = generate(spec, 1000)
      assert(objs.map(_.id) == (0 until 1000).map(_.toLong))
    }

    test(s"${spec.name}: observed rate scales with n over a fixed duration") {
      val a = generate(spec, 1000)
      val b = generate(spec, 2000)
      val ra = observedRatePerHour(a)
      val rb = observedRatePerHour(b)
      assert(math.abs(rb / ra - 2.0) < 0.05)
    }

    test(s"${spec.name}: rateMultiplier compresses the stream duration") {
      val base = generate(spec, 1000)
      val fast = generate(spec, 1000, rateMultiplier = 4.0)
      val spanBase = base.last.t - base.head.t
      val spanFast = fast.last.t - fast.head.t
      assert(math.abs(spanFast * 4.0 - spanBase).toDouble / spanBase < 0.01)
    }

    test(s"${spec.name}: spatial distribution is skewed (hotspots exist)") {
      val objs = generate(spec, 5000)
      val cfg  = spec.config()
      // bucket into ~100x100 coarse cells; the busiest holds far more than uniform share
      val counts = objs.groupBy(o =>
        (math.floor((o.x - spec.lonMin) / (spec.lonRange / 30)).toInt,
         math.floor((o.y - spec.latMin) / (spec.latRange / 30)).toInt)).map(_._2.size)
      assert(counts.max > 3 * (5000 / 900), s"max cell count ${counts.max} too uniform")
      assert(cfg.rectW > 0 && cfg.rectH > 0)
    }
  }

  test("Table I geometry is reproduced") {
    assert(UK.durationHours > 173 && UK.durationHours < 175)
    assert(US.durationHours > 59 && US.durationHours < 60)
    assert(Taxi.durationHours > 55 && Taxi.durationHours < 56)
    assert(math.abs(Taxi.queryW - 0.0009) < 1e-12)
    assert(math.abs(Taxi.queryH - 0.0006) < 1e-9)
  }

  test("default configs use the paper's default windows") {
    assert(UK.config().windowMillis == 3600000L)
    assert(US.config().windowMillis == 3600000L)
    assert(Taxi.config().windowMillis == 300000L)
  }
}

package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SpatialStreams

/** Smoke-level validation of the experiment drivers at tiny scale: every
  * table generator runs end-to-end and produces structurally sane rows.
  * (The real numbers are produced by `bench/` at SURGE_BENCH_N scale.)
  */
class TablesSpec extends AnyFunSuite {
  private val N = 1200

  test("tableI reports one row per dataset with the Table I geometry") {
    val rows = Tables.tableI(N)
    assert(rows.map(_.name).toSet == Set("Taxi", "UK", "US"))
    rows.foreach { r =>
      assert(r.n == N)
      assert(r.ratePerHour > 0)
      val spec = SpatialStreams.all.find(_.name == r.name).get
      assert(r.lonLo >= spec.lonMin && r.lonHi <= spec.lonMax)
      assert(r.latLo >= spec.latMin && r.latHi <= spec.latMax)
      // rate scales as n/1e6 of the paper rate
      assert(math.abs(r.ratePerHour / (spec.paperRatePerHour * N / 1e6) - 1.0) < 0.05)
    }
  }

  test("tableII produces all 15 rows with ratios in [0,100] and CCS ~<= B-CCS") {
    val rows = Tables.tableII(N)
    assert(rows.length == 15)
    rows.foreach { r =>
      assert(r.ccs >= 0 && r.ccs <= 100)
      assert(r.bccs >= 0 && r.bccs <= 100)
      // statistical tendency (exact at bench scale; a few points of slack at
      // smoke scale where both trigger on a third of the messages)
      assert(r.ccs <= r.bccs + 5.0,
             s"${r.dataset}/${r.window}: CCS ${r.ccs}% should not exceed B-CCS ${r.bccs}%")
    }
    // at smoke scale the stream is too sparse for the dynamic bound to pay
    // off (nearly every event touches a fresh cell); just require CCS not to
    // be systematically worse. The clear CCS ≪ B-CCS gap is a density effect
    // reproduced at bench scale (see EXPERIMENTS.md, Table II).
    assert(rows.map(_.ccs).sum <= rows.map(_.bccs).sum * 1.05)
  }

  test("tableIII produces 5 alpha rows with ratios in (0,110]") {
    val rows = Tables.tableIII(N, sampleEvery = 50)
    assert(rows.map(_.alpha) == Seq(0.1, 0.3, 0.5, 0.7, 0.9))
    rows.foreach { r =>
      assert(r.gaps > 0 && r.gaps <= 100 + 1e-6, s"alpha ${r.alpha}: gaps ${r.gaps}")
      assert(r.mgaps > 0 && r.mgaps <= 100 + 1e-6)
      assert(r.mgaps >= r.gaps - 25.0) // MGAPS is never much worse on average
      // theoretical floor
      assert(r.gaps >= (1 - r.alpha) / 4 * 100 - 1e-6)
    }
  }

  test("tableIV produces all 15 rows with ratios in (0,100]") {
    val rows = Tables.tableIV(N, sampleEvery = 50)
    assert(rows.length == 15)
    rows.foreach { r =>
      assert(r.gaps > 0 && r.gaps <= 100 + 1e-6, s"${r.dataset}/${r.window}: ${r.gaps}")
      assert(r.mgaps > 0 && r.mgaps <= 100 + 1e-6)
    }
  }

  test("runtimeTable measures every algorithm on every dataset") {
    val rows = Tables.runtimeTable(600, algos = Seq("CCS", "GAPS", "MGAPS"))
    assert(rows.length == 9)
    rows.foreach(r => assert(r.nsPerMsg > 0))
  }

  test("topKTable measures the three extensions") {
    val rows = Tables.topKTable(500, ks = Seq(3), datasets = Seq(SpatialStreams.Taxi))
    assert(rows.length == 3)
    assert(rows.map(_.algo).toSet == Set("kCCS", "kGAPS", "kMGAPS"))
    rows.foreach(r => assert(r.nsPerMsg > 0))
  }

  test("scalabilityTable produces t_h for CCS and GAPS") {
    val rows = Tables.scalabilityTable(500, mults = Seq(1, 2))
    assert(rows.length == 12)
    rows.foreach(r => assert(r.secPerStreamHour >= 0))
  }

  test("fmtTable renders aligned markdown-ish tables") {
    val s = Tables.fmtTable(Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(s.linesIterator.size == 4)
    assert(s.contains("| a "))
  }
}

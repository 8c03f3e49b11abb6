package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGen
import repro.core.topk._
import repro.exp.Tables.LiveSet
import repro.stream.EventStream

/** Top-k validation: kCCS (Algorithm 4) must produce the greedy score
  * vector of Definition 9 after every event; the approximate extensions
  * must be well-formed and respect their structural guarantees.
  * Test streams use continuous weights, so burst-score ties between
  * different cover sets have probability ~0 and the greedy score vector is
  * well-defined regardless of which tied point an implementation picks.
  */
class TopKSpec extends AnyFunSuite {

  private def scores(v: Seq[Option[BurstyPoint]]): Seq[Double] =
    v.map(_.map(_.score).getOrElse(0.0))

  for (k <- Seq(1, 2, 3); seed <- 0 until 8)
    test(s"kCCS matches brute-force greedy top-$k after every event, seed $seed") {
      val cfg  = TestGen.cfg(windowMillis = 1000L, alpha = (seed % 10) / 10.0)
      val algo = new KCellCspot(cfg, k)
      val live = new LiveSet(cfg.windowMillis)
      EventStream.fromObjects(TestGen.stream(seed, 30), cfg.windowMillis).foreach { e =>
        live(e)
        val got = scores(algo.onEvent(e))
        val exp = scores(BruteForce.topK(live.objectsAt(e.at), e.at, cfg, k))
        got.zip(exp).zipWithIndex.foreach { case ((g, x), i) =>
          assert(math.abs(g - x) < 1e-6,
                 s"k=$k level ${i + 1} at ${e.kind}@${e.at}: got $g, expected $x (all got=$got exp=$exp)")
        }
      }
    }

  for (seed <- 0 until 5)
    test(s"kCCS on clustered streams, k=3, seed $seed") {
      val cfg  = TestGen.cfg(windowMillis = 1200L, alpha = 0.5)
      val algo = new KCellCspot(cfg, 3)
      val live = new LiveSet(cfg.windowMillis)
      EventStream.fromObjects(TestGen.clusteredStream(seed, 35), cfg.windowMillis).foreach { e =>
        live(e)
        val got = scores(algo.onEvent(e))
        val exp = scores(BruteForce.topK(live.objectsAt(e.at), e.at, cfg, 3))
        got.zip(exp).foreach { case (g, x) => assert(math.abs(g - x) < 1e-6, s"got=$got exp=$exp") }
      }
    }

  test("kCCS top-k scores are non-increasing in k") {
    val cfg  = TestGen.cfg(windowMillis = 1000L)
    val algo = new KCellCspot(cfg, 4)
    EventStream.fromObjects(TestGen.stream(21, 40), cfg.windowMillis, drainTail = false).foreach { e =>
      val s = scores(algo.onEvent(e))
      s.sliding(2).foreach {
        case Seq(a, b) => assert(a >= b - 1e-9, s"scores not descending: $s")
        case _         => ()
      }
    }
  }

  test("kCCS level-1 result equals plain CCS") {
    val cfg = TestGen.cfg(windowMillis = 1000L)
    val k3  = new KCellCspot(cfg, 3)
    val ccs = new CellCspot(cfg, BoundMode.Full)
    EventStream.fromObjects(TestGen.stream(22, 40), cfg.windowMillis).foreach { e =>
      val top  = k3.onEvent(e).head.map(_.score).getOrElse(0.0)
      val base = ccs.onEvent(e).map(_.score).getOrElse(0.0)
      assert(math.abs(top - base) < 1e-6)
    }
  }

  for (seed <- 0 until 6)
    test(s"kGAPS equals the k best reference cell scores, seed $seed") {
      val cfg  = TestGen.cfg(windowMillis = 1500L, alpha = 0.5)
      val algo = new KGapSurge(cfg, 3)
      val grid = new Grid(cfg.rectW, cfg.rectH)
      val live = new LiveSet(cfg.windowMillis)
      EventStream.fromObjects(TestGen.stream(seed, 60), cfg.windowMillis).foreach { e =>
        live(e)
        val got = algo.onEvent(e).map(_.score)
        val ref = live.objectsAt(e.at)
          .groupBy(o => grid.cellOf(o.x, o.y))
          .map { case (_, os) =>
            val fc = os.filter(o => Win.of(o.t, e.at, cfg.windowMillis) == Win.Cur).map(o => cfg.delta(o.w)).sum
            val fp = os.filter(o => Win.of(o.t, e.at, cfg.windowMillis) == Win.Past).map(o => cfg.delta(o.w)).sum
            cfg.burst(fc, fp)
          }
          .toSeq.sorted(Ordering[Double].reverse)
        // non-empty cells only; the structure drops fully-expired cells
        val expected = ref.take(got.length)
        got.zip(expected).foreach { case (g, x) => assert(math.abs(g - x) < 1e-6) }
      }
    }

  test("kMGAPS results are disjoint, descending, and at least as good as kGAPS's best") {
    val cfg  = TestGen.cfg(windowMillis = 1500L)
    val kg   = new KGapSurge(cfg, 3)
    val km   = new KMGapSurge(cfg, 3)
    EventStream.fromObjects(TestGen.clusteredStream(30, 80), cfg.windowMillis, drainTail = false)
      .foreach { e =>
        kg.process(e); km.process(e)
      }
    val g = kg.current
    val m = km.current
    assert(m.nonEmpty)
    m.sliding(2).foreach {
      case Seq(a, b) => assert(a.score >= b.score - 1e-9)
      case _         => ()
    }
    for (i <- m.indices; j <- m.indices if i < j)
      assert(!m(i).box.overlapsOpen(m(j).box))
    if (g.nonEmpty) assert(m.head.score >= g.head.score - 1e-9)
  }
}

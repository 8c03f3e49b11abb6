package repro.data

import java.util.Random
import scala.collection.mutable.ArrayBuffer
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{SpatialObj, SurgeConfig}

/** Synthetic spatial-object streams standing in for the paper's UK / US /
  * Taxi datasets (Table I). See DESIGN.md §3 for the substitution rationale.
  *
  * Each stream reproduces Table I's bounding box and stream duration
  * (1M objects at the reported arrival rate); the object count is scalable
  * (`n` objects spread over the *same* duration, i.e. the rate scales by
  * n/1M, preserving the window-size-to-duration geometry). Positions are a
  * zipf-weighted mixture of Gaussian hotspots over a uniform background,
  * with transient burst episodes that concentrate arrivals near a hotspot
  * for a short time — the spatial skew and temporal burstiness that drive
  * the algorithms. Weights are uniform integers in [1,100] (§VII-A).
  * Everything is deterministic in (spec, n).
  */
object SpatialStreams {

  /** Descriptor for one Table-I dataset.
    *
    * @param paperRatePerHour arrival rate of the real dataset (Table I)
    * @param durationHours    1e6 / rate — the real stream's timespan
    */
  final case class DatasetSpec(name: String,
                               lonMin: Double, lonMax: Double,
                               latMin: Double, latMax: Double,
                               paperRatePerHour: Double,
                               defaultWindowMillis: Long,
                               seed: Long) {
    val durationHours: Double = 1e6 / paperRatePerHour
    def durationMillis: Long  = (durationHours * 3600000.0).toLong
    def lonRange: Double      = lonMax - lonMin
    def latRange: Double      = latMax - latMin

    /** The paper's default query rectangle `q`: 1/1000 of each range. */
    def queryW: Double = lonRange / 1000.0
    def queryH: Double = latRange / 1000.0

    /** Default configuration: size `q`, dataset default window, α. */
    def config(alpha: Double = 0.5): SurgeConfig =
      SurgeConfig(queryW, queryH, defaultWindowMillis, alpha)
  }

  private val Hour   = 3600000L
  private val Minute = 60000L

  /** Ranges exactly as printed in Table I. */
  val UK: DatasetSpec =
    DatasetSpec("UK", 171.1, 181.9, 139.0, 150.9, 5747.0, Hour, seed = 41L)
  val US: DatasetSpec =
    DatasetSpec("US", 40.2, 118.8, 100.1, 150.4, 16802.0, Hour, seed = 42L)
  val Taxi: DatasetSpec =
    DatasetSpec("Taxi", 12.0, 12.9, 41.6, 42.2, 18145.0, 5 * Minute, seed = 43L)

  val all: Seq[DatasetSpec] = Seq(Taxi, UK, US)

  private final case class Burst(cx: Double, cy: Double, start: Long, end: Long)

  /** Generate `n` objects over the spec's full duration (timestamps start
    * at `t0 = 2·|maxWindow|` so window arithmetic stays positive).
    */
  def generate(spec: DatasetSpec, n: Int, rateMultiplier: Double = 1.0): IndexedSeq[SpatialObj] = {
    require(n > 0)
    val rng = new Random(spec.seed)
    val durMs = math.max(1L, (spec.durationMillis / rateMultiplier).toLong)
    val t0    = 48L * Hour

    // Many hotspots with a *flat-ish* popularity law (∝ 1/√rank): real
    // geo-tweet streams have many comparable dense cells (city centres), and
    // that competition is what makes B-CCS's static bound loose (Table II).
    val nHot = 40
    val hotX = Array.fill(nHot)(spec.lonMin + rng.nextDouble() * spec.lonRange)
    val hotY = Array.fill(nHot)(spec.latMin + rng.nextDouble() * spec.latRange)
    val hotCdf = {
      val w = Array.tabulate(nHot)(r => 1.0 / math.pow(r + 1.0, 0.2))
      val s = w.sum
      w.scanLeft(0.0)(_ + _).tail.map(_ / s)
    }
    // Hotspots are ~one grid cell wide: the paper's cells are city-sized
    // (q = range/1000 ≈ 7 km for US), so a real "hotspot" IS a dense cell.
    // Forty near-equal dense cells make the score landscape competitive,
    // which is what drives Table II's B-CCS behaviour (its static bound
    // tops the heap for most events) and keeps GAPS below the optimum
    // (hotspots straddle grid lines at random).
    val sigmaX = spec.queryW * 0.7
    val sigmaY = spec.queryH * 0.7

    // A dozen transient burst episodes anchored near hotspots, each a few
    // query-rectangles wide and ~1/60 of the stream long. Mild enough that
    // the bursty region stays comparable to the steady hotspots.
    val bursts = Array.fill(12) {
      val h     = rng.nextInt(nHot)
      val start = t0 + (rng.nextDouble() * 0.85 * durMs).toLong
      Burst(
        hotX(h) + (rng.nextDouble() - 0.5) * sigmaX,
        hotY(h) + (rng.nextDouble() - 0.5) * sigmaY,
        start,
        start + durMs / 60,
      )
    }
    val burstSigmaX = 4.0 * spec.queryW
    val burstSigmaY = 4.0 * spec.queryH

    def clip(v: Double, lo: Double, hi: Double): Double = math.min(hi, math.max(lo, v))

    val out = new ArrayBuffer[SpatialObj](n)
    var i = 0
    while (i < n) {
      val t = t0 + (i.toDouble * durMs / n).toLong
      val active = bursts.find(b => t >= b.start && t <= b.end)
      val (x, y) = active match {
        case Some(b) if rng.nextDouble() < 0.2 =>
          (clip(b.cx + rng.nextGaussian() * burstSigmaX, spec.lonMin, spec.lonMax),
           clip(b.cy + rng.nextGaussian() * burstSigmaY, spec.latMin, spec.latMax))
        case _ =>
          if (rng.nextDouble() < 0.25)
            (spec.lonMin + rng.nextDouble() * spec.lonRange,
             spec.latMin + rng.nextDouble() * spec.latRange)
          else {
            val u = rng.nextDouble()
            var h = 0
            while (h < nHot - 1 && hotCdf(h) < u) h += 1
            (clip(hotX(h) + rng.nextGaussian() * sigmaX, spec.lonMin, spec.lonMax),
             clip(hotY(h) + rng.nextGaussian() * sigmaY, spec.latMin, spec.latMax))
          }
      }
      val w = 1.0 + rng.nextInt(100)
      out += SpatialObj(i.toLong, w, x, y, t)
      i += 1
    }
    out.toIndexedSeq
  }

  /** Observed arrival rate (objects/hour) of a generated stream. */
  def observedRatePerHour(objs: IndexedSeq[SpatialObj]): Double = {
    if (objs.length < 2) return 0.0
    val span = (objs.last.t - objs.head.t).toDouble / Hour
    if (span <= 0) 0.0 else objs.length / span
  }

  /** DataFrame view (columns `id, w, x, y, t`) for the Spark layer. */
  def toDF(spark: SparkSession, objs: Seq[SpatialObj]): DataFrame = {
    import spark.implicits._
    objs.toDF()
  }
}

package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.util.DetRandom

/** Synthetic stand-in for the paper's evaluation dataset (NOAA/NCEI USCRN
  * hourly 2020 station readings — unavailable offline; see DESIGN.md §3).
  *
  * Each station's hourly temperature-like signal is
  * ``annual sinusoid + diurnal sinusoid + region-shared AR(1) weather +
  * station noise``. Stations are grouped into regions: same-region pairs
  * share the weather component and similar seasonal phase, giving the
  * high, slowly-drifting correlations real climate networks exhibit —
  * the regime in which Dangoron's Eq. 2 jumps pay off — while the AR(1)
  * weather introduces genuine non-stationarity so skip decisions are
  * fallible (accuracy < 100%, as in the paper).
  */
object ClimateData {

  final case class Spec(
      nStations: Int,
      hours: Int,
      nRegions: Int = 8,
      seed: Long = 7L,
      seasonalAmp: Double = 10.0,
      diurnalAmp: Double = 4.0,
      weatherAmp: Double = 5.0,
      noiseAmp: Double = 1.5,
      ar1: Double = 0.98
  ) {
    require(nStations > 0 && hours > 0 && nRegions > 0 && nRegions <= nStations)
    def regionOf(sid: Int): Int = sid * nRegions / nStations
  }

  /** Region-shared AR(1) weather tracks, generated sequentially on the
    * driver (AR recursion is inherently serial) and broadcast.
    */
  def weatherTracks(spec: Spec): Array[Array[Double]] =
    Array.tabulate(spec.nRegions) { r =>
      val w = new Array[Double](spec.hours)
      var prev = 0.0
      var t = 0
      while (t < spec.hours) {
        prev = spec.ar1 * prev +
          math.sqrt(1.0 - spec.ar1 * spec.ar1) * DetRandom.gaussian(spec.seed, 1000L + r, t.toLong)
        w(t) = spec.weatherAmp * prev
        t += 1
      }
      w
    }

  /** Value of station ``sid`` at hour ``t`` given its region's weather. */
  def value(spec: Spec, weather: Array[Array[Double]], sid: Int, t: Long): Double = {
    val region = spec.regionOf(sid)
    // Station-specific deterministic modifiers.
    val seasonalGain = 0.8 + 0.4 * DetRandom.uniform(spec.seed, 2000L + sid, 0L)
    val seasonalPhase = 0.3 * (DetRandom.uniform(spec.seed, 2000L + sid, 1L) - 0.5) +
      2.0 * math.Pi * region / (3.0 * spec.nRegions)
    val diurnalGain = 0.8 + 0.4 * DetRandom.uniform(spec.seed, 2000L + sid, 2L)
    val base = 10.0 + 10.0 * DetRandom.uniform(spec.seed, 2000L + sid, 3L)
    base +
      spec.seasonalAmp * seasonalGain * math.sin(2.0 * math.Pi * t / 8760.0 + seasonalPhase) +
      spec.diurnalAmp * diurnalGain * math.sin(2.0 * math.Pi * t / 24.0) +
      weather(region)(t.toInt) +
      spec.noiseAmp * DetRandom.gaussian(spec.seed, 3000L + sid, t)
  }

  /** Driver-side N × hours matrix (unit tests, streaming feeder). */
  def hourlyLocal(spec: Spec): Array[Array[Double]] = {
    val w = weatherTracks(spec)
    Array.tabulate(spec.nStations)(sid => Array.tabulate(spec.hours)(t => value(spec, w, sid, t.toLong)))
  }

  /** Long-format DataFrame ``(sid, t, v)``, generated distributively from
    * the broadcast weather tracks.
    */
  def hourly(spark: SparkSession, spec: Spec): DataFrame = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(weatherTracks(spec))
    val hours = spec.hours
    spark
      .range(spec.nStations.toLong * hours)
      .map { id =>
        val sid = (id / hours).toInt
        val t = id % hours
        (sid, t, value(spec, bc.value, sid, t))
      }
      .toDF("sid", "t", "v")
  }
}

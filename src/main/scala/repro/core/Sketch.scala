package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

/** One series' values within one basic window (sorted by time). */
final case class Segment(sid: Int, bw: Int, vals: Array[Double])

/** Per-series basic-window statistics (TSUBASA's per-series sketch). */
final case class SeriesBw(sid: Int, bw: Int, cnt: Long, mean: Double, m2: Double)

/** Per-pair per-basic-window statistics row (before assembly into arrays). */
final case class PairBw(i: Int, j: Int, bw: Int,
                        meanX: Double, m2x: Double,
                        meanY: Double, m2y: Double, cp: Double)

/** One series' full raw values over the query range — naive baseline input. */
final case class SeriesArr(sid: Int, vals: Array[Double])

/** The basic-window sketch substrate, shared by Dangoron and TSUBASA.
  *
  * Input contract throughout: a long-format DataFrame with columns
  * ``sid`` (int), ``t`` (long, dense time steps), ``v`` (double). Sketch
  * construction is pure DataFrame/Dataset work: one shuffle to segment the
  * series into basic windows, one join on the basic-window id to form all
  * N(N−1)/2 pair statistics, one shuffle to assemble per-pair arrays.
  */
object Sketch {

  /** Segment the query range into basic windows, values time-ordered. */
  def segments(values: DataFrame, q: SlidingQuery): Dataset[Segment] = {
    val spark = values.sparkSession
    import spark.implicits._
    val start = q.start; val end = q.end; val b = q.bwSize
    values
      .select(col("sid").cast("int"), col("t").cast("long"), col("v").cast("double"))
      .where(col("t") >= start && col("t") < end)
      .as[(Int, Long, Double)]
      .groupByKey { case (sid, t, _) => (sid, ((t - start) / b).toInt) }
      .mapGroups { (key, rows) =>
        Segment(key._1, key._2, rows.toArray.sortBy(_._2).map(_._3))
      }
  }

  /** Per-series basic-window stats from segments. */
  def seriesStats(segs: Dataset[Segment]): Dataset[SeriesBw] = {
    val spark = segs.sparkSession
    import spark.implicits._
    segs.map { s =>
      val (mean, m2) = meanM2(s.vals)
      SeriesBw(s.sid, s.bw, s.vals.length.toLong, mean, m2)
    }
  }

  /** All-pairs per-basic-window stats: segments self-joined on the basic
    * window id (i < j), centered cross products computed per row. This is
    * the expensive precompute both frameworks share.
    */
  def pairStats(segs: Dataset[Segment]): Dataset[PairBw] = {
    val spark = segs.sparkSession
    import spark.implicits._
    val a = segs.toDF("sid", "bw", "vals").alias("a")
    val b = segs.toDF("sid", "bw", "vals").alias("b")
    a.join(b, col("a.bw") === col("b.bw") && col("a.sid") < col("b.sid"))
      .select(
        col("a.sid").as("i"), col("b.sid").as("j"), col("a.bw").as("bw"),
        col("a.vals").as("xs"), col("b.vals").as("ys"))
      .as[(Int, Int, Int, Array[Double], Array[Double])]
      .map { case (i, j, bw, xs, ys) =>
        require(xs.length == ys.length, s"ragged basic window bw=$bw for pair ($i,$j)")
        val (mx, m2x) = meanM2(xs)
        val (my, m2y) = meanM2(ys)
        var cpv = 0.0
        var u = 0
        while (u < xs.length) { cpv += (xs(u) - mx) * (ys(u) - my); u += 1 }
        PairBw(i, j, bw, mx, m2x, my, m2y, cpv)
      }
  }

  /** Assemble per-pair array sketches (one row per pair, arrays indexed by
    * local basic-window id). Requires every pair to have all ``nBw`` basic
    * windows — synthetic inputs here are dense.
    */
  def pairSketches(pairBw: Dataset[PairBw], q: SlidingQuery): Dataset[PairSketch] = {
    val spark = pairBw.sparkSession
    import spark.implicits._
    val nBw = q.nBw
    pairBw
      .groupByKey(r => (r.i, r.j))
      .mapGroups { (key, rows) =>
        val (i, j) = key
        val meanX = new Array[Double](nBw); val m2x = new Array[Double](nBw)
        val meanY = new Array[Double](nBw); val m2y = new Array[Double](nBw)
        val cp = new Array[Double](nBw)
        var seen = 0
        rows.foreach { r =>
          meanX(r.bw) = r.meanX; m2x(r.bw) = r.m2x
          meanY(r.bw) = r.meanY; m2y(r.bw) = r.m2y
          cp(r.bw) = r.cp; seen += 1
        }
        require(seen == nBw, s"pair ($i,$j) has $seen of $nBw basic windows — input not dense")
        PairSketch(i, j, meanX, m2x, meanY, m2y, cp)
      }
  }

  /** Build pair sketches straight from raw values. */
  def build(values: DataFrame, q: SlidingQuery): Dataset[PairSketch] =
    pairSketches(pairStats(segments(values, q)), q)

  /** Full raw series arrays over the query range (naive baseline, ParCorr). */
  def seriesArrays(values: DataFrame, q: SlidingQuery): Dataset[SeriesArr] = {
    val spark = values.sparkSession
    import spark.implicits._
    val start = q.start; val end = q.end; val len = (end - start).toInt
    values
      .select(col("sid").cast("int"), col("t").cast("long"), col("v").cast("double"))
      .where(col("t") >= start && col("t") < end)
      .as[(Int, Long, Double)]
      .groupByKey(_._1)
      .mapGroups { (sid, rows) =>
        val arr = new Array[Double](len)
        var seen = 0
        rows.foreach { case (_, t, v) => arr((t - start).toInt) = v; seen += 1 }
        require(seen == len, s"series $sid has $seen of $len points — input not dense")
        SeriesArr(sid, arr)
      }
  }

  /** All ordered pairs (i < j) of full raw series. */
  def seriesPairs(arrs: Dataset[SeriesArr]): Dataset[(Int, Int, Array[Double], Array[Double])] = {
    val spark = arrs.sparkSession
    import spark.implicits._
    val a = arrs.toDF("sid", "vals").alias("a")
    val b = arrs.toDF("sid", "vals").alias("b")
    a.join(b, col("a.sid") < col("b.sid"))
      .select(col("a.sid"), col("b.sid"), col("a.vals"), col("b.vals"))
      .as[(Int, Int, Array[Double], Array[Double])]
  }

  /** Mean and centered sum of squares in one pass. */
  def meanM2(vals: Array[Double]): (Double, Double) = {
    var s = 0.0
    var u = 0
    while (u < vals.length) { s += vals(u); u += 1 }
    val mean = s / vals.length
    var m2 = 0.0
    u = 0
    while (u < vals.length) { val d = vals(u) - mean; m2 += d * d; u += 1 }
    (mean, m2)
  }
}

package repro.parcorr

import org.apache.spark.sql.{DataFrame, Dataset}
import repro.core.{Edge, Sketch, SlidingQuery, SeriesArr, PairMath}
import repro.util.DetRandom

/** ParCorr baseline (Yagoubi et al., DAMI '18), reimplemented from the
  * published algorithm: identify correlated pairs across sliding windows
  * via random-projection sketches.
  *
  * Each series' current window is projected onto ``d`` time-indexed
  * Rademacher vectors ``r(dim, t) ∈ {±1}`` (hash-derived, so the
  * projections of overlapping windows share their common terms and slide
  * incrementally — ParCorr's efficiency claim). The window mean is removed
  * in sketch space (``ĉ = s − μ·R`` where ``R`` is the projection of the
  * all-ones vector, also maintained incrementally), and correlation is
  * estimated by the cosine of the centered sketches:
  * ``corr ≈ ⟨ĉ_x, ĉ_y⟩ / (‖ĉ_x‖·‖ĉ_y‖)`` — the estimator is exact for
  * affinely dependent windows and its error shrinks as d grows.
  *
  * This is an ''approximate'' method — Table 2 compares its edge accuracy
  * against Dangoron's, as the paper does.
  */
object ParCorr {

  /** One series' centered sketch at one sliding window. */
  final case class WindowSketch(sid: Int, w: Int, sketch: Array[Double], mean: Double, std: Double)

  /** Sketch every window of one series, rolling the projections and the
    * moment sums incrementally across slides. Pure Scala (runs in tasks).
    */
  def sketchSeries(sid: Int, vals: Array[Double], q: SlidingQuery, d: Int, seed: Long): Vector[WindowSketch] = {
    val l = q.windowLen
    val sk = new Array[Double](d)   // projection of the raw window
    val ones = new Array[Double](d) // projection of the all-ones vector
    var sum = 0.0
    var sumSq = 0.0
    def add(t: Int): Unit = {
      val v = vals(t)
      sum += v; sumSq += v * v
      var dim = 0
      while (dim < d) {
        val r = DetRandom.rademacher(seed, dim.toLong, q.start + t)
        sk(dim) += v * r; ones(dim) += r
        dim += 1
      }
    }
    def remove(t: Int): Unit = {
      val v = vals(t)
      sum -= v; sumSq -= v * v
      var dim = 0
      while (dim < d) {
        val r = DetRandom.rademacher(seed, dim.toLong, q.start + t)
        sk(dim) -= v * r; ones(dim) -= r
        dim += 1
      }
    }
    var t = 0
    while (t < l) { add(t); t += 1 }
    val out = Vector.newBuilder[WindowSketch]
    var w = 0
    while (w < q.numWindows) {
      val mean = sum / l
      val varr = math.max(0.0, sumSq / l - mean * mean)
      val centered = Array.tabulate(d)(dim => sk(dim) - mean * ones(dim))
      out += WindowSketch(sid, w, centered, mean, math.sqrt(varr))
      if (w + 1 < q.numWindows) {
        var u = w * q.step
        while (u < (w + 1) * q.step) { remove(u); u += 1 }
        u = w * q.step + l
        while (u < (w + 1) * q.step + l) { add(u); u += 1 }
      }
      w += 1
    }
    out.result()
  }

  /** Correlation estimate: cosine of the centered sketches. */
  def estimate(a: WindowSketch, b: WindowSketch, d: Int, l: Int): Double = {
    if (a.std <= 1e-9 || b.std <= 1e-9) return 0.0
    var dot = 0.0; var na = 0.0; var nb = 0.0
    var dim = 0
    while (dim < d) {
      dot += a.sketch(dim) * b.sketch(dim)
      na += a.sketch(dim) * a.sketch(dim)
      nb += b.sketch(dim) * b.sketch(dim)
      dim += 1
    }
    if (na <= 1e-12 || nb <= 1e-12) 0.0
    else PairMath.clamp(dot / math.sqrt(na) / math.sqrt(nb))
  }

  /** Thresholded edge estimates for the whole sliding query.
    *
    * Spark layout: per-series window sketches (flatMap over series, rolling
    * updates inside the task), self-joined per window (i < j), estimates
    * filtered at β — the DataFrame-filter pruning path.
    */
  def edges(arrs: Dataset[SeriesArr], q: SlidingQuery, d: Int = 32, seed: Long = 1234): Dataset[Edge] = {
    val spark = arrs.sparkSession
    import spark.implicits._
    import org.apache.spark.sql.functions.col
    val sketches = arrs.flatMap(sa => sketchSeries(sa.sid, sa.vals, q, d, seed))
    val a = sketches.toDF("sid", "w", "sketch", "mean", "std").alias("a")
    val b = sketches.toDF("sid", "w", "sketch", "mean", "std").alias("b")
    val l = q.windowLen; val beta = q.beta
    a.join(b, col("a.w") === col("b.w") && col("a.sid") < col("b.sid"))
      .select(
        col("a.sid").as("i"), col("b.sid").as("j"), col("a.w").as("w"),
        col("a.sketch").as("skA"), col("a.mean").as("muA"), col("a.std").as("sdA"),
        col("b.sketch").as("skB"), col("b.mean").as("muB"), col("b.std").as("sdB"))
      .as[(Int, Int, Int, Array[Double], Double, Double, Array[Double], Double, Double)]
      .flatMap { case (i, j, w, skA, muA, sdA, skB, muB, sdB) =>
        val c = estimate(WindowSketch(i, w, skA, muA, sdA), WindowSketch(j, w, skB, muB, sdB), d, l)
        if (c >= beta) Some(Edge(i, j, w, c)) else None
      }
  }

  /** Convenience: raw values → series arrays → edges. */
  def run(values: DataFrame, q: SlidingQuery, d: Int = 32, seed: Long = 1234): Dataset[Edge] =
    edges(Sketch.seriesArrays(values, q), q, d, seed)
}

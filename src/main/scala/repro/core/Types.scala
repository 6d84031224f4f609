package repro.core

/** A sliding-window correlation query, exactly as in the paper's Problem
  * Definition: query range ``r = (start, end)`` (end exclusive), window size
  * ``windowLen`` (the paper's ``l``), slide step ``step`` (``η``), threshold
  * ``beta`` (``β``), all in raw time steps (columns of X), plus the basic
  * window size ``bwSize`` (``B``) used by the sketch substrate.
  *
  * Alignment requirements mirror the basic-window framework: the window
  * length, the step, and the query range must all be multiples of the basic
  * window size, so every sliding window is a whole number of basic windows
  * (the paper's ``n_s = windowLen / bwSize``) and every slide shifts by a
  * whole number of basic windows (``s = step / bwSize``).
  */
final case class SlidingQuery(
    start: Long,
    end: Long,
    windowLen: Int,
    step: Int,
    beta: Double,
    bwSize: Int
) {
  require(windowLen > 0 && step > 0 && bwSize > 0, "windowLen, step, bwSize must be positive")
  require(end > start, "query range must be non-empty")
  require(windowLen % bwSize == 0, s"windowLen=$windowLen must be a multiple of bwSize=$bwSize")
  require(step % bwSize == 0, s"step=$step must be a multiple of bwSize=$bwSize")
  require((end - start) % bwSize == 0, s"query range length must be a multiple of bwSize=$bwSize")
  require(end - start >= windowLen, "query range must contain at least one full window")
  require(beta >= -1.0 - 1e-12 && beta <= 1.0 + 1e-12, "beta must lie in [-1, 1]")

  /** Number of basic windows per query window (the paper's ``n_s``). */
  val nS: Int = windowLen / bwSize

  /** Number of basic windows per slide step. */
  val s: Int = step / bwSize

  /** Number of basic windows in the whole query range. */
  val nBw: Int = ((end - start) / bwSize).toInt

  /** Number of sliding windows (``γ + 1`` in the paper). */
  val numWindows: Int = (nBw - nS) / s + 1

  /** Local basic-window offset of sliding window ``w``. */
  def windowOffsetBw(w: Int): Int = w * s

  /** Raw-time start of sliding window ``w``. */
  def windowStartT(w: Int): Long = start + w.toLong * step
}

/** Per-pair basic-window sketch over the query range.
  *
  * All arrays are indexed by local basic-window index ``0 until nBw``.
  * ``meanX``/``meanY`` are the basic-window means, ``m2x``/``m2y`` the
  * centered sums of squares ``Σ (v − mean)²``, and ``cp`` the centered
  * cross products ``Σ (x − meanX)(y − meanY)``. Together these are exactly
  * the statistics of the paper's Eq. 1 (σ = sqrt(m2/B), c = cp/sqrt(m2x·m2y)),
  * stored in the numerically safer cov form.
  */
final case class PairSketch(
    i: Int,
    j: Int,
    meanX: Array[Double],
    m2x: Array[Double],
    meanY: Array[Double],
    m2y: Array[Double],
    cp: Array[Double]
) {
  def nBw: Int = meanX.length
}

/** A thresholded network edge: ``corr(i, j) ≥ β`` in sliding window ``w``. */
final case class Edge(i: Int, j: Int, w: Int, corr: Double)

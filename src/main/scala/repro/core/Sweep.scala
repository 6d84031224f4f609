package repro.core

import scala.collection.mutable.ArrayBuffer

/** Result of sweeping one pair across all sliding windows.
  *
  * ``edges`` holds ``(window, corr)`` for windows where the pair is at or
  * above the threshold; ``computed`` counts windows evaluated exactly and
  * ``skipped`` windows eliminated by the Eq. 2 jump — together they always
  * sum to ``numWindows``.
  */
final case class SweepResult(edges: Vector[(Int, Double)], computed: Long, skipped: Long)

/** Per-pair sweep algorithms — pure Scala, executed inside Spark tasks by
  * [[repro.core.Dangoron]] and [[repro.tsubasa.Tsubasa]] and directly by
  * unit tests.
  */
object Sweep {

  /** Dangoron's sweep (the paper's core contribution): evaluate a window
    * exactly; if the pair is below β, binary-search the Eq. 2 prefix-sum
    * bound for the furthest window that is still provably (under the
    * paper's assumption) below β, skip straight past it, and re-evaluate at
    * the landing window. Consecutive evaluated windows reuse sums with an
    * O(s) roll instead of an O(n_s) rebuild.
    */
  def dangoron(sk: PairSketch, q: SlidingQuery): SweepResult = {
    val out = new ArrayBuffer[(Int, Double)]
    var computed = 0L
    var skipped = 0L
    val prefix = Bounds.upperPrefix(sk)
    var w = 0
    var sums = PairMath.buildSums(sk, 0, q.nS)
    while (w < q.numWindows) {
      val corr = PairMath.corrFromSums(sums, q.nS, q.bwSize)
      computed += 1
      if (corr >= q.beta) {
        out += ((w, corr))
        if (w + 1 < q.numWindows) PairMath.roll(sums, sk, q.windowOffsetBw(w), q.nS, q.s)
        w += 1
      } else {
        val inStart = q.windowOffsetBw(w) + q.nS
        val k = Bounds.maxJump(corr, q.beta, prefix, inStart, q.s, q.nS, q.numWindows - 1 - w)
        if (k == 0) {
          if (w + 1 < q.numWindows) PairMath.roll(sums, sk, q.windowOffsetBw(w), q.nS, q.s)
          w += 1
        } else {
          skipped += k
          w += k + 1
          if (w < q.numWindows) sums = PairMath.buildSums(sk, q.windowOffsetBw(w), q.nS)
        }
      }
    }
    SweepResult(out.toVector, computed, skipped)
  }

  /** TSUBASA's sliding query: recombine every window from the sketch from
    * scratch (O(n_s) per window, no cross-window reuse, no skipping) — the
    * baseline behaviour the paper attributes to TSUBASA on sliding queries.
    */
  def tsubasa(sk: PairSketch, q: SlidingQuery): SweepResult = {
    val out = new ArrayBuffer[(Int, Double)]
    var w = 0
    while (w < q.numWindows) {
      val corr = PairMath.windowCorr(sk, q.windowOffsetBw(w), q.nS, q.bwSize)
      if (corr >= q.beta) out += ((w, corr))
      w += 1
    }
    SweepResult(out.toVector, q.numWindows.toLong, 0L)
  }

  /** Exact sweep over raw values — the ground truth. ``x`` and ``y`` cover
    * the query range (index 0 = query start).
    */
  def naive(x: Array[Double], y: Array[Double], q: SlidingQuery): Vector[(Int, Double)] = {
    require(x.length >= q.nBw * q.bwSize, s"series shorter (${x.length}) than query range (${q.nBw * q.bwSize})")
    (0 until q.numWindows).iterator.map { w =>
      (w, PairMath.directPearson(x, y, w * q.step, q.windowLen))
    }.toVector
  }
}

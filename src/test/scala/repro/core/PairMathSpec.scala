package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.util.DetRandom

/** Helpers for building in-memory pair sketches from raw arrays. */
object TestSeries {

  /** Deterministic pseudo-random series: sinusoid + hash noise. */
  def series(seed: Long, sid: Int, len: Int,
             amp: Double = 1.0, noise: Double = 0.5, period: Double = 37.0): Array[Double] =
    Array.tabulate(len) { t =>
      amp * math.sin(2 * math.Pi * t / period + sid * 0.7) +
        noise * DetRandom.gaussian(seed, sid.toLong, t.toLong)
    }

  /** Random-walk series — non-stationary, breaks Eq. 2's assumption. */
  def randomWalk(seed: Long, sid: Int, len: Int): Array[Double] = {
    val a = new Array[Double](len)
    var acc = 0.0
    var t = 0
    while (t < len) { acc += DetRandom.gaussian(seed, sid.toLong, t.toLong); a(t) = acc; t += 1 }
    a
  }

  /** Build the pair sketch of (x, y) at basic-window size b, locally. */
  def sketchOf(x: Array[Double], y: Array[Double], b: Int, i: Int = 0, j: Int = 1): PairSketch = {
    require(x.length == y.length && x.length % b == 0, "length must be a multiple of b")
    val nBw = x.length / b
    val meanX = new Array[Double](nBw); val m2x = new Array[Double](nBw)
    val meanY = new Array[Double](nBw); val m2y = new Array[Double](nBw)
    val cp = new Array[Double](nBw)
    for (t <- 0 until nBw) {
      val (mx, sx) = Sketch.meanM2(x.slice(t * b, (t + 1) * b))
      val (my, sy) = Sketch.meanM2(y.slice(t * b, (t + 1) * b))
      meanX(t) = mx; m2x(t) = sx; meanY(t) = my; m2y(t) = sy
      cp(t) = (0 until b).map(u => (x(t * b + u) - mx) * (y(t * b + u) - my)).sum
    }
    PairSketch(i, j, meanX, m2x, meanY, m2y, cp)
  }
}

class PairMathSpec extends AnyFunSuite {
  import TestSeries._

  // --- Eq. 1 exactness: sketch recombination equals direct Pearson -------
  for {
    b <- Seq(2, 4, 8, 16)
    nS <- Seq(2, 3, 5, 8)
    seed <- Seq(1L, 2L)
  } test(s"Eq.1 windowCorr equals direct Pearson (b=$b, nS=$nS, seed=$seed)") {
    val len = b * (nS + 6)
    val x = series(seed, 0, len)
    val y = series(seed, 1, len)
    val sk = sketchOf(x, y, b)
    for (from <- 0 to (len / b - nS)) {
      val viaSketch = PairMath.windowCorr(sk, from, nS, b)
      val direct = PairMath.directPearson(x, y, from * b, nS * b)
      assert(math.abs(viaSketch - direct) < 1e-9,
        s"from=$from sketch=$viaSketch direct=$direct")
    }
  }

  for (seed <- Seq(3L, 4L, 5L))
    test(s"Eq.1 exact on non-stationary random walks too (seed=$seed)") {
      val b = 8; val nS = 4; val len = 96
      val x = randomWalk(seed, 0, len)
      val y = randomWalk(seed, 1, len)
      val sk = sketchOf(x, y, b)
      for (from <- 0 to (len / b - nS))
        assert(math.abs(PairMath.windowCorr(sk, from, nS, b) -
          PairMath.directPearson(x, y, from * b, nS * b)) < 1e-9)
    }

  // --- Rolling sums ------------------------------------------------------
  for (s <- Seq(1, 2, 3)) test(s"rolled sums equal rebuilt sums (s=$s)") {
    val b = 4; val nS = 6; val len = b * 30
    val x = series(11L, 0, len); val y = series(11L, 1, len)
    val sk = sketchOf(x, y, b)
    val sums = PairMath.buildSums(sk, 0, nS)
    var from = 0
    while (from + s + nS <= len / b) {
      PairMath.roll(sums, sk, from, nS, s)
      from += s
      val fresh = PairMath.buildSums(sk, from, nS)
      assert(math.abs(PairMath.corrFromSums(sums, nS, b) -
        PairMath.corrFromSums(fresh, nS, b)) < 1e-9, s"at from=$from")
    }
  }

  test("corrFromSums matches windowCorr") {
    val sk = sketchOf(series(7L, 0, 64), series(7L, 1, 64), 4)
    val sums = PairMath.buildSums(sk, 3, 5)
    assert(PairMath.corrFromSums(sums, 5, 4) === PairMath.windowCorr(sk, 3, 5, 4))
  }

  // --- Degenerate inputs --------------------------------------------------
  test("constant series gives correlation 0, not NaN") {
    val x = Array.fill(32)(5.0)
    val y = series(9L, 1, 32)
    val sk = sketchOf(x, y, 4)
    assert(PairMath.windowCorr(sk, 0, 8, 4) === 0.0)
    assert(PairMath.directPearson(x, y) === 0.0)
  }

  test("perfectly correlated series gives exactly 1") {
    val x = series(10L, 0, 64)
    val y = x.map(v => 2.5 * v + 3.0)
    val sk = sketchOf(x, y, 8)
    assert(math.abs(PairMath.windowCorr(sk, 0, 8, 8) - 1.0) < 1e-12)
    assert(math.abs(PairMath.directPearson(x, y) - 1.0) < 1e-12)
  }

  test("perfectly anti-correlated series gives exactly -1") {
    val x = series(10L, 0, 64)
    val y = x.map(v => -1.5 * v + 1.0)
    assert(math.abs(PairMath.directPearson(x, y) + 1.0) < 1e-12)
    val sk = sketchOf(x, y, 8)
    assert(math.abs(PairMath.windowCorr(sk, 0, 8, 8) + 1.0) < 1e-12)
  }

  test("bwCorr returns the basic-window correlation") {
    val b = 16
    val x = series(12L, 0, 64); val y = series(12L, 1, 64)
    val sk = sketchOf(x, y, b)
    for (t <- 0 until 4)
      assert(math.abs(PairMath.bwCorr(sk, t) -
        PairMath.directPearson(x, y, t * b, b)) < 1e-9)
  }

  test("bwCorr falls back on zero-variance basic windows") {
    val x = Array.fill(16)(1.0)
    val y = series(13L, 1, 16)
    val sk = sketchOf(x, y, 8)
    assert(PairMath.bwCorr(sk, 0, fallback = -1.0) === -1.0)
    assert(PairMath.bwCorr(sk, 1, fallback = 1.0) === 1.0)
  }

  test("clamp restricts to [-1, 1]") {
    assert(PairMath.clamp(1.7) === 1.0)
    assert(PairMath.clamp(-3.0) === -1.0)
    assert(PairMath.clamp(0.25) === 0.25)
  }

  test("directPearson slice bounds are validated") {
    val x = new Array[Double](10); val y = new Array[Double](10)
    intercept[IllegalArgumentException] { PairMath.directPearson(x, y, 5, 6) }
  }

  test("meanM2 computes mean and centered sum of squares") {
    val (mean, m2) = Sketch.meanM2(Array(1.0, 2.0, 3.0, 4.0))
    assert(mean === 2.5)
    assert(math.abs(m2 - 5.0) < 1e-12)
  }
}

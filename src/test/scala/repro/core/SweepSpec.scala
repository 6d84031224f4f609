package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.util.DetRandom

class SweepSpec extends AnyFunSuite {
  import TestSeries._

  private def query(len: Int, b: Int, nS: Int, s: Int, beta: Double) =
    SlidingQuery(0L, len.toLong, windowLen = nS * b, step = s * b, beta = beta, bwSize = b)

  // --- TSUBASA sweep is exact for every window ----------------------------
  for {
    b <- Seq(4, 8)
    nS <- Seq(3, 6)
    s <- Seq(1, 2)
  } test(s"tsubasa sweep equals naive sweep above beta (b=$b, nS=$nS, s=$s)") {
    val len = b * 32
    val x = series(21L, 0, len); val y = series(21L, 1, len)
    val q = query(len, b, nS, s, beta = 0.2)
    val sk = sketchOf(x, y, b)
    val got = Sweep.tsubasa(sk, q).edges.toMap
    val expect = Sweep.naive(x, y, q).filter(_._2 >= q.beta).toMap
    assert(got.keySet === expect.keySet)
    got.foreach { case (w, c) => assert(math.abs(c - expect(w)) < 1e-9) }
  }

  test("tsubasa computes every window, skips none") {
    val len = 128; val q = query(len, 4, 4, 1, 0.5)
    val sk = sketchOf(series(22L, 0, len), series(22L, 1, len), 4)
    val r = Sweep.tsubasa(sk, q)
    assert(r.computed === q.numWindows.toLong)
    assert(r.skipped === 0L)
  }

  // --- Dangoron: work accounting -------------------------------------------
  for (beta <- Seq(-1.0, 0.0, 0.5, 0.9, 1.0))
    test(s"dangoron computed + skipped covers all windows (beta=$beta)") {
      val len = 256; val q = query(len, 4, 8, 1, beta)
      val sk = sketchOf(series(23L, 0, len), series(23L, 1, len), 4)
      val r = Sweep.dangoron(sk, q)
      assert(r.computed + r.skipped === q.numWindows.toLong)
    }

  // --- Dangoron with beta = -1 must equal naive exactly (no skipping pays) --
  for {
    b <- Seq(4, 8)
    nS <- Seq(4, 8)
    s <- Seq(1, 2)
    seed <- Seq(31L, 32L)
  } test(s"dangoron at beta=-1 equals naive everywhere (b=$b, nS=$nS, s=$s, seed=$seed)") {
    val len = b * 40
    val x = series(seed, 0, len); val y = series(seed, 1, len)
    val q = query(len, b, nS, s, beta = -1.0)
    val r = Sweep.dangoron(sketchOf(x, y, b), q)
    val expect = Sweep.naive(x, y, q)
    assert(r.edges.size === q.numWindows) // every window is an edge at beta=-1
    r.edges.zip(expect).foreach { case ((w1, c1), (w2, c2)) =>
      assert(w1 === w2)
      assert(math.abs(c1 - c2) < 1e-9, s"window $w1: $c1 vs $c2")
    }
  }

  // --- Reported edges are always exact (only skips are heuristic) ----------
  for (beta <- Seq(0.3, 0.6, 0.8); seed <- Seq(41L, 42L))
    test(s"dangoron reported edge values are exact (beta=$beta, seed=$seed)") {
      val b = 8; val len = b * 36
      val x = series(seed, 0, len); val y = series(seed, 1, len)
      val q = query(len, b, 6, 1, beta)
      val naive = Sweep.naive(x, y, q).toMap
      val r = Sweep.dangoron(sketchOf(x, y, b), q)
      r.edges.foreach { case (w, c) =>
        assert(math.abs(c - naive(w)) < 1e-9, s"window $w value drifted")
        assert(c >= beta, "reported edge below threshold")
      }
    }

  // --- No false positives: every reported edge is truly >= beta -------------
  test("dangoron never reports a false edge (random walks, many seeds)") {
    for (seed <- 0 until 20) {
      val b = 8; val len = b * 30
      val x = randomWalk(seed + 500, 0, len)
      val y = randomWalk(seed + 600, 1, len)
      val q = query(len, b, 5, 1, 0.6)
      val naive = Sweep.naive(x, y, q).toMap
      Sweep.dangoron(sketchOf(x, y, b), q).edges.foreach { case (w, c) =>
        assert(naive(w) >= q.beta - 1e-9)
        assert(math.abs(c - naive(w)) < 1e-9)
      }
    }
  }

  // --- Skipping actually happens on low-correlation data -------------------
  test("dangoron skips most windows when all pairs are far below beta") {
    val b = 8; val len = b * 64
    // independent noise: corr ~ 0, far below beta = 0.9
    val x = series(71L, 0, len, amp = 0.0, noise = 1.0)
    val y = series(72L, 1, len, amp = 0.0, noise = 1.0)
    val q = query(len, b, 8, 1, 0.9)
    val r = Sweep.dangoron(sketchOf(x, y, b), q)
    assert(r.skipped > q.numWindows / 2,
      s"expected majority skipped, got ${r.skipped} of ${q.numWindows}")
  }

  test("dangoron skips nothing when every window is above beta") {
    val b = 8; val len = b * 32
    val x = series(73L, 0, len, noise = 0.05)
    val y = x.map(_ * 1.3 + 0.5) // corr == 1 everywhere
    val q = query(len, b, 4, 1, 0.5)
    val r = Sweep.dangoron(sketchOf(x, y, b), q)
    assert(r.skipped === 0L)
    assert(r.edges.size === q.numWindows)
  }

  // --- Accuracy on assumption-satisfying data ------------------------------
  test("dangoron pair-window classification accuracy > 90% on stationary data") {
    var correct = 0L; var total = 0L
    for (seed <- 0 until 15) {
      val b = 8; val len = b * 50
      val x = series(seed + 900L, 0, len, amp = 0.6, noise = 0.8)
      val y = series(seed + 900L, 1, len, amp = 0.6, noise = 0.8) // shared seed -> shared sinusoid phaseish
      val q = query(len, b, 6, 1, 0.5)
      val naive = Sweep.naive(x, y, q).toMap
      val got = Sweep.dangoron(sketchOf(x, y, b), q).edges.toMap
      for (w <- 0 until q.numWindows) {
        val predicted = got.contains(w)
        val actual = naive(w) >= q.beta
        if (predicted == actual) correct += 1
        total += 1
      }
    }
    assert(total > 500)
    assert(correct.toDouble / total > 0.9, s"accuracy ${correct.toDouble / total}")
  }

  // --- Naive sweep sanity ---------------------------------------------------
  test("naive sweep window count and indexing") {
    val q = query(96, 4, 4, 2, 0.0)
    val x = series(81L, 0, 96); val y = series(81L, 1, 96)
    val sweep = Sweep.naive(x, y, q)
    assert(sweep.size === q.numWindows)
    assert(sweep.head._1 === 0)
    assert(sweep.last._1 === q.numWindows - 1)
    // window w covers [w*step, w*step + windowLen)
    val w = 3
    assert(math.abs(sweep(w)._2 - PairMath.directPearson(x, y, w * q.step, q.windowLen)) < 1e-12)
  }

  test("naive sweep rejects too-short series") {
    val q = query(96, 4, 4, 2, 0.0)
    intercept[IllegalArgumentException] {
      Sweep.naive(new Array[Double](50), new Array[Double](50), q)
    }
  }
}

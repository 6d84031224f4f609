package repro.util

import org.scalatest.funsuite.AnyFunSuite

class DetRandomSpec extends AnyFunSuite {

  test("hash64 is deterministic") {
    assert(DetRandom.hash64(1L, 2L, 3L) === DetRandom.hash64(1L, 2L, 3L))
  }

  test("hash64 differs across coordinates") {
    val base = DetRandom.hash64(1L, 2L, 3L)
    assert(base !== DetRandom.hash64(1L, 2L, 4L))
    assert(base !== DetRandom.hash64(1L, 3L, 3L))
    assert(base !== DetRandom.hash64(2L, 2L, 3L))
  }

  test("uniform stays strictly inside (0, 1)") {
    for (i <- 0 until 10000) {
      val u = DetRandom.uniform(42L, i.toLong, 0L)
      assert(u > 0.0 && u < 1.0)
    }
  }

  test("uniform mean ≈ 0.5 and variance ≈ 1/12") {
    val n = 20000
    val xs = (0 until n).map(i => DetRandom.uniform(7L, i.toLong, 1L))
    val mean = xs.sum / n
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(mean - 0.5) < 0.01)
    assert(math.abs(varr - 1.0 / 12) < 0.01)
  }

  test("gaussian mean ≈ 0 and variance ≈ 1") {
    val n = 20000
    val xs = (0 until n).map(i => DetRandom.gaussian(11L, i.toLong, 0L))
    val mean = xs.sum / n
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(mean) < 0.03)
    assert(math.abs(varr - 1.0) < 0.05)
  }

  test("gaussian draws at adjacent b coordinates are uncorrelated") {
    // regression guard: gaussian(seed, a, b) internally uses 2b and 2b+1;
    // adjacent b must not collide.
    val n = 10000
    val xs = (0 until n).map(i => DetRandom.gaussian(13L, 5L, i.toLong))
    val lagged = xs.zip(xs.tail)
    val mean = xs.sum / n
    val cov = lagged.map { case (a, b) => (a - mean) * (b - mean) }.sum / (n - 1)
    assert(math.abs(cov) < 0.05)
  }

  test("rademacher is balanced and in {-1, +1}") {
    val n = 20000
    val xs = (0 until n).map(i => DetRandom.rademacher(3L, i.toLong, 9L))
    assert(xs.forall(v => v == 1.0 || v == -1.0))
    assert(math.abs(xs.sum / n) < 0.03)
  }

  test("rademacher streams for different dims are independent-ish") {
    val n = 10000
    val dot = (0 until n).map(t =>
      DetRandom.rademacher(3L, 0L, t.toLong) * DetRandom.rademacher(3L, 1L, t.toLong)).sum
    assert(math.abs(dot / n) < 0.05)
  }
}

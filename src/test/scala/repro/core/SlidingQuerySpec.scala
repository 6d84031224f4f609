package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SlidingQuerySpec extends AnyFunSuite {

  test("derived quantities for the canonical climate query") {
    val q = SlidingQuery(0L, 8760L, windowLen = 720, step = 24, beta = 0.7, bwSize = 24)
    assert(q.nS === 30)
    assert(q.s === 1)
    assert(q.nBw === 365)
    assert(q.numWindows === 336)
    assert(q.windowOffsetBw(2) === 2)
    assert(q.windowStartT(2) === 48L)
  }

  test("step spanning multiple basic windows") {
    val q = SlidingQuery(0L, 512L, windowLen = 64, step = 32, beta = 0.5, bwSize = 16)
    assert(q.nS === 4 && q.s === 2)
    assert(q.numWindows === (512 - 64) / 32 + 1)
  }

  test("non-zero start offsets windows") {
    val q = SlidingQuery(128L, 256L, windowLen = 64, step = 16, beta = 0.5, bwSize = 16)
    assert(q.windowStartT(0) === 128L)
    assert(q.nBw === 8)
  }

  test("rejects windowLen not multiple of bwSize") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 100L, 50, 10, 0.5, 20) }
  }

  test("rejects step not multiple of bwSize") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 120L, 40, 10, 0.5, 20) }
  }

  test("rejects range not multiple of bwSize") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 110L, 40, 20, 0.5, 20) }
  }

  test("rejects range shorter than one window") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 40L, 80, 20, 0.5, 20) }
  }

  test("rejects empty range") {
    intercept[IllegalArgumentException] { SlidingQuery(100L, 100L, 20, 20, 0.5, 20) }
  }

  test("rejects beta outside [-1, 1]") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 100L, 20, 20, 1.5, 20) }
  }

  test("rejects non-positive sizes") {
    intercept[IllegalArgumentException] { SlidingQuery(0L, 100L, 0, 20, 0.5, 20) }
    intercept[IllegalArgumentException] { SlidingQuery(0L, 100L, 20, 0, 0.5, 20) }
    intercept[IllegalArgumentException] { SlidingQuery(0L, 100L, 20, 20, 0.5, 0) }
  }

  test("single-window query") {
    val q = SlidingQuery(0L, 64L, 64, 64, 0.0, 8)
    assert(q.numWindows === 1)
  }

  test("window equals slide (tumbling)") {
    val q = SlidingQuery(0L, 256L, 64, 64, 0.0, 8)
    assert(q.numWindows === 4)
    assert(q.windowStartT(3) === 192L)
  }
}

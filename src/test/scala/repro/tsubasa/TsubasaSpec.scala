package repro.tsubasa

import repro.{SparkSpec, SparkTestData}
import repro.core._
import repro.naive.NaiveCorr

class TsubasaSpec extends SparkSpec {

  private lazy val n = 5
  private lazy val len = 128
  private lazy val matrix = SparkTestData.panel(71L, n, len)
  private lazy val values = SparkTestData.toValuesDf(spark, matrix)

  private def q(beta: Double, step: Int = 8) =
    SlidingQuery(0L, len.toLong, windowLen = 32, step = step, beta = beta, bwSize = 8)

  for (beta <- Seq(-1.0, 0.0, 0.5, 0.8))
    test(s"TSUBASA equals naive exactly at beta=$beta (it is an exact method)") {
      val query = q(beta)
      val (edges, _) = Tsubasa.run(values, query)
      val got = edges.collect().map(e => (e.i, e.j, e.w) -> e.corr).toMap
      val expect = NaiveCorr.allCorrs(values, query).collect()
        .filter(_.corr >= beta).map(e => (e.i, e.j, e.w) -> e.corr).toMap
      assert(got.keySet === expect.keySet)
      got.foreach { case (k, c) => assert(math.abs(c - expect(k)) < 1e-9) }
    }

  test("TSUBASA computes every pair-window (no skipping)") {
    val query = q(0.9)
    val (edges, stats) = Tsubasa.run(values, query)
    edges.count()
    val st = stats()
    assert(st.computedWindows === n.toLong * (n - 1) / 2 * query.numWindows)
    assert(st.skippedWindows === 0L)
  }

  test("TSUBASA and Dangoron agree wherever Dangoron evaluates") {
    val query = q(0.6)
    val sketches = Sketch.build(values, query)
    val (tEdges, _) = Tsubasa.edges(sketches, query)
    val (dEdges, _) = Dangoron.edges(sketches, query)
    val t = tEdges.collect().map(e => (e.i, e.j, e.w) -> e.corr).toMap
    dEdges.collect().foreach { e =>
      assert(t.contains((e.i, e.j, e.w)), "Dangoron reported an edge TSUBASA did not")
      assert(math.abs(t((e.i, e.j, e.w)) - e.corr) < 1e-9)
    }
  }

  test("ad-hoc window query matches direct Pearson on arbitrary sub-windows") {
    val query = q(0.0)
    val sketches = Sketch.build(values, query)
    for ((fromBw, nBws) <- Seq((0, 4), (3, 7), (10, 6), (0, query.nBw))) {
      val got = Tsubasa.adhocWindow(sketches, query, fromBw, nBws).collect()
      assert(got.length === n * (n - 1) / 2)
      got.foreach { case (i, j, c) =>
        val direct = PairMath.directPearson(matrix(i), matrix(j),
          fromBw * query.bwSize, nBws * query.bwSize)
        assert(math.abs(c - direct) < 1e-9, s"pair ($i,$j) window [$fromBw, +$nBws)")
      }
    }
  }

  test("ad-hoc window rejects out-of-range windows") {
    val query = q(0.0)
    val sketches = Sketch.build(values, query)
    intercept[IllegalArgumentException] {
      Tsubasa.adhocWindow(sketches, query, query.nBw - 2, 5)
    }
  }

  test("TSUBASA with multi-bw step") {
    val query = q(-1.0, step = 16)
    val (edges, _) = Tsubasa.run(values, query)
    assert(edges.count() === n.toLong * (n - 1) / 2 * query.numWindows)
  }
}

package repro.core

import repro.{SparkSpec, SparkTestData, Oracle}

class SketchSpec extends SparkSpec {
  import TestSeries._

  private lazy val n = 5
  private lazy val len = 96
  private lazy val matrix = SparkTestData.panel(51L, n, len)
  private lazy val values = SparkTestData.toValuesDf(spark, matrix)
  private lazy val q = SlidingQuery(0L, len.toLong, windowLen = 32, step = 8, beta = 0.5, bwSize = 8)

  test("segments: one per (sid, bw), values in time order") {
    val segs = Sketch.segments(values, q).collect()
    assert(segs.length === n * q.nBw)
    segs.foreach { s =>
      assert(s.vals.length === q.bwSize)
      s.vals.indices.foreach { u =>
        assert(s.vals(u) === matrix(s.sid)(s.bw * q.bwSize + u))
      }
    }
  }

  test("segments respect a non-zero query start") {
    val q2 = SlidingQuery(16L, 80L, windowLen = 32, step = 8, beta = 0.5, bwSize = 8)
    val segs = Sketch.segments(values, q2).collect()
    assert(segs.length === n * q2.nBw)
    val seg0 = segs.find(s => s.sid == 0 && s.bw == 0).get
    seg0.vals.indices.foreach(u => assert(seg0.vals(u) === matrix(0)(16 + u)))
  }

  test("seriesStats match local mean/m2") {
    val stats = Sketch.seriesStats(Sketch.segments(values, q)).collect()
    assert(stats.length === n * q.nBw)
    stats.foreach { st =>
      val slice = matrix(st.sid).slice(st.bw * q.bwSize, (st.bw + 1) * q.bwSize)
      val (mean, m2) = Sketch.meanM2(slice)
      assert(st.cnt === q.bwSize.toLong)
      assert(math.abs(st.mean - mean) < 1e-9)
      assert(math.abs(st.m2 - m2) < 1e-9)
    }
  }

  test("seriesStats agree with the DuckDB oracle (group-by mean)") {
    import org.apache.spark.sql.functions._
    val sparkDf = Sketch.seriesStats(Sketch.segments(values, q)).toDF()
      .select(col("sid"), col("bw"), col("cnt"), round(col("mean"), 4).as("m"))
    // NB: DuckDB's / on integers is float division; // is integer division.
    val sql =
      s"""SELECT CAST(sid AS INT) AS sid,
         |       CAST(CAST(t AS BIGINT) // ${q.bwSize} AS INT) AS bw,
         |       count(*) AS cnt,
         |       round(avg(CAST(v AS DOUBLE)), 4) AS m
         |FROM ts
         |GROUP BY 1, 2""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "ts" -> values)
  }

  test("pairStats: all i<j pairs for every basic window, cp correct") {
    val ps = Sketch.pairStats(Sketch.segments(values, q)).collect()
    assert(ps.length === n * (n - 1) / 2 * q.nBw)
    ps.foreach { p =>
      assert(p.i < p.j)
      val xs = matrix(p.i).slice(p.bw * q.bwSize, (p.bw + 1) * q.bwSize)
      val ys = matrix(p.j).slice(p.bw * q.bwSize, (p.bw + 1) * q.bwSize)
      val (mx, m2x) = Sketch.meanM2(xs)
      val (my, m2y) = Sketch.meanM2(ys)
      val cp = xs.indices.map(u => (xs(u) - mx) * (ys(u) - my)).sum
      assert(math.abs(p.meanX - mx) < 1e-9)
      assert(math.abs(p.m2x - m2x) < 1e-9)
      assert(math.abs(p.meanY - my) < 1e-9)
      assert(math.abs(p.m2y - m2y) < 1e-9)
      assert(math.abs(p.cp - cp) < 1e-9)
    }
  }

  test("pairSketches assemble arrays identical to the local builder") {
    val sks = Sketch.build(values, q).collect()
    assert(sks.length === n * (n - 1) / 2)
    sks.foreach { sk =>
      val local = sketchOf(matrix(sk.i), matrix(sk.j), q.bwSize, sk.i, sk.j)
      for (t <- 0 until q.nBw) {
        assert(math.abs(sk.meanX(t) - local.meanX(t)) < 1e-9)
        assert(math.abs(sk.m2x(t) - local.m2x(t)) < 1e-9)
        assert(math.abs(sk.meanY(t) - local.meanY(t)) < 1e-9)
        assert(math.abs(sk.m2y(t) - local.m2y(t)) < 1e-9)
        assert(math.abs(sk.cp(t) - local.cp(t)) < 1e-9)
      }
    }
  }

  test("sketch windowCorr equals direct Pearson on the distributed sketch") {
    val sks = Sketch.build(values, q).collect()
    sks.foreach { sk =>
      for (w <- 0 until q.numWindows) {
        val viaSketch = PairMath.windowCorr(sk, q.windowOffsetBw(w), q.nS, q.bwSize)
        val direct = PairMath.directPearson(matrix(sk.i), matrix(sk.j), w * q.step, q.windowLen)
        assert(math.abs(viaSketch - direct) < 1e-9)
      }
    }
  }

  test("seriesArrays reconstruct the original series over the range") {
    val arrs = Sketch.seriesArrays(values, q).collect()
    assert(arrs.length === n)
    arrs.foreach { sa =>
      sa.vals.indices.foreach(t => assert(sa.vals(t) === matrix(sa.sid)(t)))
    }
  }

  test("seriesPairs yields every i<j combination once") {
    val pairs = Sketch.seriesPairs(Sketch.seriesArrays(values, q)).collect()
    assert(pairs.map(p => (p._1, p._2)).toSet ===
      (for (i <- 0 until n; j <- (i + 1) until n) yield (i, j)).toSet)
  }

  test("pairSketches reject non-dense input (ragged pair windows)") {
    // punch a hole in ONE series only, so pair basic windows go ragged
    val sparse = values.where("NOT (sid = 0 AND t = 13)")
    val ex = intercept[Exception] {
      Sketch.build(sparse, q).collect()
    }
    assert(ex.getMessage != null)
  }

  test("sketch build handles a single pair (n=2)") {
    val m2 = Array(series(99L, 0, 64), series(99L, 1, 64))
    val v2 = SparkTestData.toValuesDf(spark, m2)
    val q2 = SlidingQuery(0L, 64L, 32, 16, 0.0, 16)
    val sks = Sketch.build(v2, q2).collect()
    assert(sks.length === 1)
    assert(sks.head.i === 0 && sks.head.j === 1)
  }
}

package repro.core

import repro.{SparkSpec, SparkTestData}
import repro.naive.NaiveCorr

class DangoronSparkSpec extends SparkSpec {

  private lazy val n = 6
  private lazy val len = 192
  private lazy val matrix = SparkTestData.panel(61L, n, len)
  private lazy val values = SparkTestData.toValuesDf(spark, matrix)

  private def q(beta: Double) =
    SlidingQuery(0L, len.toLong, windowLen = 48, step = 8, beta = beta, bwSize = 8)

  test("beta = -1: Dangoron equals naive on every pair-window") {
    val query = q(-1.0)
    val (edges, _) = Dangoron.run(values, query)
    val got = edges.collect().map(e => (e.i, e.j, e.w) -> e.corr).toMap
    val expect = NaiveCorr.allCorrs(values, query).collect()
      .map(e => (e.i, e.j, e.w) -> e.corr).toMap
    assert(got.keySet === expect.keySet)
    assert(got.size === n * (n - 1) / 2 * query.numWindows)
    got.foreach { case (k, c) => assert(math.abs(c - expect(k)) < 1e-9, s"at $k") }
  }

  for (beta <- Seq(0.4, 0.7, 0.9)) {
    test(s"reported edges are exact and truly above beta=$beta") {
      val query = q(beta)
      val (edges, _) = Dangoron.run(values, query)
      val truth = NaiveCorr.allCorrs(values, query).collect()
        .map(e => (e.i, e.j, e.w) -> e.corr).toMap
      edges.collect().foreach { e =>
        assert(e.corr >= beta)
        assert(math.abs(e.corr - truth((e.i, e.j, e.w))) < 1e-9)
      }
    }
  }

  test("accumulators: computed + skipped = pairs × windows") {
    val query = q(0.7)
    val (edges, stats) = Dangoron.run(values, query)
    edges.count()
    val st = stats()
    assert(st.totalWindows === n.toLong * (n - 1) / 2 * query.numWindows)
  }

  test("high beta on noise-dominated pairs skips a large fraction") {
    val query = q(0.95)
    val (edges, stats) = Dangoron.run(values, query)
    edges.count()
    val st = stats()
    assert(st.skippedWindows > 0, "expected some Eq.2 jumps")
    assert(st.skippedFraction > 0.2, s"skipped only ${st.skippedFraction}")
  }

  test("pair-window classification accuracy > 90% vs naive (paper's metric)") {
    val query = q(0.6)
    val (edges, _) = Dangoron.run(values, query)
    val got = edges.collect().map(e => (e.i, e.j, e.w)).toSet
    val truthAll = NaiveCorr.allCorrs(values, query).collect()
    var correct = 0
    truthAll.foreach { e =>
      val predicted = got.contains((e.i, e.j, e.w))
      val actual = e.corr >= query.beta
      if (predicted == actual) correct += 1
    }
    val acc = correct.toDouble / truthAll.length
    assert(acc > 0.9, s"accuracy $acc")
  }

  test("correlated cluster pairs produce sustained edges, noise pairs few") {
    val query = q(0.7)
    val (edges, _) = Dangoron.run(values, query)
    val byPair = edges.collect().groupBy(e => (e.i, e.j)).view.mapValues(_.length).toMap
    val clusterPairs = for (i <- 0 until n / 2; j <- (i + 1) until n / 2) yield (i, j)
    val noisePairs = for (i <- n / 2 until n; j <- (i + 1) until n) yield (i, j)
    val clusterEdges = clusterPairs.map(p => byPair.getOrElse(p, 0)).sum
    val noiseEdges = noisePairs.map(p => byPair.getOrElse(p, 0)).sum
    assert(clusterEdges > 10 * math.max(1, noiseEdges),
      s"cluster=$clusterEdges noise=$noiseEdges — generator or sweep broken")
  }

  // --- Horizontal pruning ----------------------------------------------------
  test("horizontal pruning is lossless (same edges as unpruned)") {
    val query = q(0.7)
    val sketches = Sketch.build(values, query)
    for (w <- Seq(0, 3, 7)) {
      val pruned = HorizontalPrune.edgesForWindow(sketches, query, w, pivot = 0)
      val full = sketches.collect().flatMap { sk =>
        val c = PairMath.windowCorr(sk, query.windowOffsetBw(w), query.nS, query.bwSize)
        if (c >= query.beta) Some(Edge(sk.i, sk.j, w, c)) else None
      }.toSet
      assert(pruned.edges.toSet === full, s"window $w")
    }
  }

  test("horizontal pruning actually prunes pairs at high beta") {
    val query = q(0.9)
    val sketches = Sketch.build(values, query)
    val r = HorizontalPrune.edgesForWindow(sketches, query, w = 0, pivot = 0)
    assert(r.prunedPairs > 0, "no pairs pruned — pivot bound never fired")
    assert(r.prunedPairs + r.computedPairs === n.toLong * (n - 1) / 2)
  }

  test("pivotCorrs returns one exact correlation per other series") {
    val query = q(0.5)
    val sketches = Sketch.build(values, query)
    val pc = HorizontalPrune.pivotCorrs(sketches, query, w = 0, pivot = 2)
    assert(pc.keySet === (0 until n).toSet - 2)
    pc.foreach { case (other, c) =>
      val (i, j) = if (other < 2) (other, 2) else (2, other)
      val direct = PairMath.directPearson(matrix(i), matrix(j), 0, query.windowLen)
      assert(math.abs(c - direct) < 1e-9)
    }
  }

  test("streams of different lengths per window count: step > bwSize") {
    val query = SlidingQuery(0L, len.toLong, windowLen = 48, step = 24, beta = -1.0, bwSize = 8)
    val (edges, stats) = Dangoron.run(values, query)
    val cnt = edges.count()
    assert(cnt === n.toLong * (n - 1) / 2 * query.numWindows)
    assert(stats().totalWindows === cnt)
  }
}

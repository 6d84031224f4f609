package repro.naive

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SparkTestData}
import repro.core._

/** The ground-truth baseline itself is verified against DuckDB's corr()
  * (the repo's result-equality oracle), so every accuracy number in the
  * benches rests on an independently-checked foundation.
  */
class NaiveCorrSpec extends SparkSpec {

  private lazy val n = 4
  private lazy val len = 64
  private lazy val matrix = SparkTestData.panel(91L, n, len)
  private lazy val values = SparkTestData.toValuesDf(spark, matrix)
  private lazy val q = SlidingQuery(0L, len.toLong, windowLen = 32, step = 16, beta = 0.0, bwSize = 16)

  private def duckSql(q: SlidingQuery): String =
    s"""SELECT CAST(w.w AS INT) AS w,
       |       CAST(a.sid AS INT) AS i,
       |       CAST(b.sid AS INT) AS j,
       |       round(corr(CAST(a.v AS DOUBLE), CAST(b.v AS DOUBLE)), 4) AS r
       |FROM ts a
       |JOIN ts b ON a.t = b.t AND CAST(a.sid AS INT) < CAST(b.sid AS INT)
       |JOIN win w ON CAST(a.t AS BIGINT) >= CAST(w.ws AS BIGINT)
       |          AND CAST(a.t AS BIGINT) <  CAST(w.we AS BIGINT)
       |GROUP BY 1, 2, 3""".stripMargin

  private def winDf(q: SlidingQuery) = {
    import spark.implicits._
    (0 until q.numWindows)
      .map(w => (w, q.windowStartT(w), q.windowStartT(w) + q.windowLen))
      .toDF("w", "ws", "we")
  }

  test("edgesSql (Catalyst corr) matches the DuckDB oracle") {
    Oracle.assertEquivalent(NaiveCorr.edgesSql(values, q), duckSql(q),
      "ts" -> values, "win" -> winDf(q))
  }

  test("edgesSql matches DuckDB with overlapping windows (step < windowLen/2)") {
    val q2 = SlidingQuery(0L, len.toLong, windowLen = 32, step = 8, beta = 0.0, bwSize = 8)
    Oracle.assertEquivalent(NaiveCorr.edgesSql(values, q2), duckSql(q2),
      "ts" -> values, "win" -> winDf(q2))
  }

  test("allCorrs (array path) matches edgesSql (Catalyst path)") {
    import spark.implicits._
    val viaArrays = NaiveCorr.allCorrs(values, q)
      .map(e => (e.w, e.i, e.j, BigDecimal(e.corr).setScale(4, BigDecimal.RoundingMode.HALF_UP).toDouble))
      .toDF("w", "i", "j", "r")
    val viaSql = NaiveCorr.edgesSql(values, q)
    val a = viaArrays.collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getDouble(3)).toMap
    val b = viaSql.collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getDouble(3)).toMap
    assert(a.keySet === b.keySet)
    a.foreach { case (k, v) => assert(math.abs(v - b(k)) <= 1e-4 + 1e-9, s"at $k: $v vs ${b(k)}") }
  }

  test("allCorrs matches the DuckDB oracle directly") {
    import spark.implicits._
    val sparkDf = NaiveCorr.allCorrs(values, q)
      .toDF().select(col("w"), col("i"), col("j"), round(col("corr"), 4).as("r"))
    Oracle.assertEquivalent(sparkDf, duckSql(q), "ts" -> values, "win" -> winDf(q))
  }

  test("allCorrs count = pairs × windows") {
    assert(NaiveCorr.allCorrs(values, q).count() ===
      n.toLong * (n - 1) / 2 * q.numWindows)
  }

  test("edges applies the threshold") {
    val q2 = q.copy(beta = 0.8)
    val edges = NaiveCorr.edges(values, q2).collect()
    assert(edges.forall(_.corr >= 0.8))
    val all = NaiveCorr.allCorrs(values, q2).collect()
    assert(edges.length === all.count(_.corr >= 0.8))
  }

  test("edgesFromArrays equals edges") {
    val q2 = q.copy(beta = 0.5)
    val viaValues = NaiveCorr.edges(values, q2).collect().toSet
    val arrs = Sketch.seriesArrays(values, q2)
    val viaArrs = NaiveCorr.edgesFromArrays(arrs, q2).collect().toSet
    assert(viaValues === viaArrs)
  }

  test("symmetric input: corr(i,j) appears once with i < j") {
    val all = NaiveCorr.allCorrs(values, q).collect()
    assert(all.forall(e => e.i < e.j))
    assert(all.map(e => (e.i, e.j, e.w)).distinct.length === all.length)
  }
}

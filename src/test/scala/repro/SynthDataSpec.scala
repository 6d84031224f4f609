package repro

import org.apache.spark.sql.functions._

/** Sanity for the provided TPC-H-lite generators (oracle plumbing) and the
  * repo's time-series extension of SynthData.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and sized by SF") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 0)
    assert(a.count() === 6000L)
    assert(a.columns.contains("l_extendedprice"))
  }

  test("TPC-H-lite aggregate agrees with the DuckDB oracle") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"),
        round(sum(col("l_quantity")), 2).as("sum_qty"))
      .select("l_returnflag", "cnt", "sum_qty")
    val sql =
      """SELECT l_returnflag,
        |       count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "lineitem" -> li)
  }

  test("orders joins lineitem on a shared key domain") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val o = SynthData.orders(spark, sf = 0.001)
    val joined = li.join(o, li("l_orderkey") === o("o_orderkey")).count()
    assert(joined > 0L)
  }

  test("zipfKeys are skewed: top key dominates") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0)
    assert(top.getLong(1) > 20000 / 100, "zipf head should be heavy")
  }

  test("uniformKeys cover the key range roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length === 10)
    assert(counts.max < counts.min * 2L)
  }

  test("timeSeries extension emits the long-format (sid, t, v) schema") {
    val ts = SynthData.timeSeries(spark, n = 3, len = 48)
    assert(ts.columns.toSeq === Seq("sid", "t", "v"))
    assert(ts.count() === 3L * 48)
    assert(ts.select("sid").distinct().count() === 3L)
  }
}

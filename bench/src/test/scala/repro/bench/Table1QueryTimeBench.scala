package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Table 1 — pure query time: Dangoron vs TSUBASA (+ naive at reduced N).
  *
  * Paper claim: "Dangoron is an order of magnitude faster than TSUBASA in
  * terms of pure query time" on the NCEI USCRN hourly 2020 data.
  * Workload: N stations × one year hourly, 30-day windows sliding daily,
  * daily basic windows (336 sliding windows). Scale via BENCH_N / BENCH_HOURS.
  */
class Table1QueryTimeBench extends SparkSpec {

  test("Table 1: pure query time, Dangoron vs TSUBASA vs naive") {
    val n = sys.env.getOrElse("BENCH_N", "200").toInt
    val hours = sys.env.getOrElse("BENCH_HOURS", "17520").toInt
    val bw = sys.env.getOrElse("BENCH_BW", "12").toInt
    val wlen = sys.env.getOrElse("BENCH_WLEN", "1440").toInt
    val step = sys.env.getOrElse("BENCH_STEP", "12").toInt
    val (values, _) = Experiments.climateWorkload(spark, n, hours, beta = 0.7)
    // Deeper query than the unit-scale default: 60-day windows sliding
    // 12 hours over 2 years at 12-hour basic windows — per-pair work large
    // enough that the sweep, not Spark task overhead, dominates wall-clock.
    val q = repro.core.SlidingQuery(0L, hours.toLong, windowLen = wlen,
      step = step, beta = 0.7, bwSize = bw)
    val rows = Experiments.table1(spark, values, q,
      betas = Seq(0.5, 0.7, 0.9), runNaive = sys.env.get("BENCH_NAIVE").contains("1"))
    println(Experiments.printT1(rows))
    // Reproduction gates. The paper's headline is "an order of magnitude
    // faster in pure query time". The algorithmic quantity behind that —
    // pair-windows evaluated — must show a ~10x reduction at high beta;
    // wall-clock must show a clear multiple too (Spark task/JIT overhead
    // flattens small constants at simulator scale, hence the softer gate).
    val dangoron = rows.filter(_.framework == "Dangoron")
    val bestWork = dangoron.map(_.workRatioVsTsubasa).max
    val bestWall = dangoron.map(_.speedupVsTsubasa).max
    assert(bestWork > 8.0, f"best work reduction only $bestWork%.2fx — paper claims ~10x")
    assert(bestWall > 2.0, f"best wall-clock speedup only $bestWall%.2fx")
    dangoron.foreach { r =>
      assert(r.speedupVsTsubasa > 1.0, s"Dangoron slower than TSUBASA at beta=${r.beta}")
    }
  }
}

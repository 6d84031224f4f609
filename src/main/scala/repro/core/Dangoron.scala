package repro.core

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.util.LongAccumulator

/** Work counters for one Dangoron (or TSUBASA) run. Valid only after an
  * action has materialized the edge Dataset.
  */
final case class RunStats(computedWindows: Long, skippedWindows: Long) {
  def totalWindows: Long = computedWindows + skippedWindows
  def skippedFraction: Double =
    if (totalWindows == 0) 0.0 else skippedWindows.toDouble / totalWindows
}

/** Dangoron on Spark: the per-pair jump sweep parallelized across the
  * N(N−1)/2 pairs as a typed ``flatMap`` over the pair-sketch Dataset.
  * Pairs are independent, so this is the natural distribution axis; Spark
  * accumulators surface how much work the Eq. 2 jumps eliminated.
  */
object Dangoron {

  /** Edges (corr ≥ β) plus a stats thunk (read it after an action). */
  def edges(sketches: Dataset[PairSketch], q: SlidingQuery): (Dataset[Edge], () => RunStats) = {
    val spark = sketches.sparkSession
    import spark.implicits._
    val computed: LongAccumulator = spark.sparkContext.longAccumulator("dangoron.computedWindows")
    val skipped: LongAccumulator = spark.sparkContext.longAccumulator("dangoron.skippedWindows")
    val ds = sketches.flatMap { sk =>
      val r = Sweep.dangoron(sk, q)
      computed.add(r.computed)
      skipped.add(r.skipped)
      r.edges.map { case (w, c) => Edge(sk.i, sk.j, w, c) }
    }
    (ds, () => RunStats(computed.value, skipped.value))
  }

  /** Convenience: raw values → sketches → edges. */
  def run(values: DataFrame, q: SlidingQuery): (Dataset[Edge], () => RunStats) =
    edges(Sketch.build(values, q), q)
}

package repro.exp

import org.apache.spark.sql.Dataset
import repro.core.Edge

/** Edge-classification quality of an approximate framework against the
  * exact (naive) result, over all pair-windows of a query.
  */
final case class Accuracy(
    tp: Long, fp: Long, fn: Long, totalPairWindows: Long,
    maxCorrErrOnHits: Double
) {
  def tn: Long = totalPairWindows - tp - fp - fn
  def precision: Double = if (tp + fp == 0) 1.0 else tp.toDouble / (tp + fp)
  def recall: Double = if (tp + fn == 0) 1.0 else tp.toDouble / (tp + fn)
  def f1: Double =
    if (precision + recall == 0) 0.0 else 2 * precision * recall / (precision + recall)
  /** Pair-window classification accuracy — the paper's ">90%" metric. */
  def accuracy: Double =
    if (totalPairWindows == 0) 1.0 else (tp + tn).toDouble / totalPairWindows
}

object Metrics {

  /** Compare predicted edges against exact ground-truth correlations.
    *
    * ``truthAll`` must hold EVERY pair-window correlation (unthresholded);
    * it is thresholded at ``beta`` here so one cached truth Dataset serves
    * every β of a sweep. ``maxCorrErrOnHits`` is the worst |corr −
    * exact corr| over true-positive edges (≈0 for exact frameworks).
    */
  def compare(pred: Dataset[Edge], truthAll: Dataset[Edge], beta: Double,
              totalPairWindows: Long): Accuracy = {
    val spark = pred.sparkSession
    import spark.implicits._
    val p = pred.toDF("i", "j", "w", "corr").alias("p")
    val t = truthAll.filter(_.corr >= beta).toDF("i", "j", "w", "corr").alias("t")
    import org.apache.spark.sql.functions._
    val joined = p.join(t,
      col("p.i") === col("t.i") && col("p.j") === col("t.j") && col("p.w") === col("t.w"),
      "full_outer")
    val agg = joined.agg(
      count(when(col("p.i").isNotNull && col("t.i").isNotNull, 1)).as("tp"),
      count(when(col("p.i").isNotNull && col("t.i").isNull, 1)).as("fp"),
      count(when(col("p.i").isNull && col("t.i").isNotNull, 1)).as("fn"),
      max(when(col("p.i").isNotNull && col("t.i").isNotNull,
        abs(col("p.corr") - col("t.corr")))).as("maxErr")
    ).collect()(0)
    Accuracy(
      tp = agg.getLong(0), fp = agg.getLong(1), fn = agg.getLong(2),
      totalPairWindows = totalPairWindows,
      maxCorrErrOnHits = if (agg.isNullAt(3)) 0.0 else agg.getDouble(3))
  }
}

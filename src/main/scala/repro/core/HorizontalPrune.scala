package repro.core

import org.apache.spark.sql.Dataset

/** The paper's horizontal (cross-pair) pruning: with a pivot series ``z``
  * whose correlations to every other series are known exactly, the
  * triangle/PSD bound confines ``c_xy`` to
  * ``[c_xz·c_yz − √((1−c_xz²)(1−c_yz²)), c_xz·c_yz + √(...)]``.
  * Any pair whose upper bound is below β is pruned without evaluating it —
  * lossless, because the bound is a theorem.
  *
  * Cost model: N−1 exact pivot correlations buy the chance to skip up to
  * (N−1)(N−2)/2 pair evaluations in a window.
  */
object HorizontalPrune {

  final case class WindowResult(edges: Vector[Edge], prunedPairs: Long, computedPairs: Long)

  /** Exact correlations of every series to the pivot at window ``w``. */
  def pivotCorrs(sketches: Dataset[PairSketch], q: SlidingQuery, w: Int, pivot: Int): Map[Int, Double] = {
    val from = q.windowOffsetBw(w)
    val nS = q.nS; val b = q.bwSize
    sketches
      .filter(sk => sk.i == pivot || sk.j == pivot)
      .collect()
      .map { sk =>
        val other = if (sk.i == pivot) sk.j else sk.i
        other -> PairMath.windowCorr(sk, from, nS, b)
      }
      .toMap
  }

  /** Edges of window ``w`` computed with triangle pruning against ``pivot``.
    * Pairs touching the pivot are always evaluated (their corr IS the pivot
    * table); other pairs are evaluated only if their triangle upper bound
    * reaches β.
    */
  def edgesForWindow(sketches: Dataset[PairSketch], q: SlidingQuery, w: Int, pivot: Int): WindowResult = {
    val spark = sketches.sparkSession
    val pc = pivotCorrs(sketches, q, w, pivot)
    val bc = spark.sparkContext.broadcast(pc)
    val pruned = spark.sparkContext.longAccumulator("horizontal.prunedPairs")
    val computedAcc = spark.sparkContext.longAccumulator("horizontal.computedPairs")
    val from = q.windowOffsetBw(w)
    val nS = q.nS; val b = q.bwSize; val beta = q.beta
    import spark.implicits._
    val edges = sketches
      .flatMap { sk =>
        val isPivotPair = sk.i == pivot || sk.j == pivot
        val keep =
          if (isPivotPair) true
          else {
            val m = bc.value
            (m.get(sk.i), m.get(sk.j)) match {
              case (Some(ci), Some(cj)) => Bounds.triangle(ci, cj)._2 >= beta
              case _                    => true // pivot corr unknown — cannot prune
            }
          }
        if (!keep) { pruned.add(1); None }
        else {
          computedAcc.add(1)
          val c = PairMath.windowCorr(sk, from, nS, b)
          if (c >= beta) Some(Edge(sk.i, sk.j, w, c)) else None
        }
      }
      .collect()
      .toVector
    WindowResult(edges, pruned.value, computedAcc.value)
  }
}

package repro.exp

import repro.SparkSpec
import repro.core.Edge

class MetricsSpec extends SparkSpec {

  private def ds(edges: Edge*) = {
    import spark.implicits._
    spark.createDataset(edges)
  }

  test("perfect prediction") {
    val truth = ds(Edge(0, 1, 0, 0.9), Edge(0, 1, 1, 0.8), Edge(0, 2, 0, 0.3))
    val pred = ds(Edge(0, 1, 0, 0.9), Edge(0, 1, 1, 0.8))
    val acc = Metrics.compare(pred, truth, beta = 0.5, totalPairWindows = 6)
    assert(acc.tp === 2 && acc.fp === 0 && acc.fn === 0)
    assert(acc.precision === 1.0 && acc.recall === 1.0 && acc.f1 === 1.0)
    assert(acc.accuracy === 1.0)
  }

  test("false negative counted") {
    val truth = ds(Edge(0, 1, 0, 0.9), Edge(0, 1, 1, 0.8))
    val pred = ds(Edge(0, 1, 0, 0.9))
    val acc = Metrics.compare(pred, truth, beta = 0.5, totalPairWindows = 4)
    assert(acc.tp === 1 && acc.fn === 1 && acc.fp === 0)
    assert(acc.recall === 0.5)
    assert(acc.accuracy === 0.75) // 1 TP + 2 TN of 4
  }

  test("false positive counted") {
    val truth = ds(Edge(0, 1, 0, 0.9))
    val pred = ds(Edge(0, 1, 0, 0.9), Edge(0, 2, 0, 0.7))
    val acc = Metrics.compare(pred, truth, beta = 0.5, totalPairWindows = 4)
    assert(acc.tp === 1 && acc.fp === 1 && acc.fn === 0)
    assert(acc.precision === 0.5)
  }

  test("truth below beta is thresholded away inside compare") {
    val truth = ds(Edge(0, 1, 0, 0.4)) // below beta: not a true edge
    val pred = ds()
    val acc = Metrics.compare(pred, truth, beta = 0.5, totalPairWindows = 1)
    assert(acc.tp === 0 && acc.fn === 0 && acc.fp === 0)
    assert(acc.accuracy === 1.0)
  }

  test("maxCorrErrOnHits measures value drift on true positives") {
    val truth = ds(Edge(0, 1, 0, 0.90))
    val pred = ds(Edge(0, 1, 0, 0.82))
    val acc = Metrics.compare(pred, truth, beta = 0.5, totalPairWindows = 1)
    assert(math.abs(acc.maxCorrErrOnHits - 0.08) < 1e-9)
  }

  test("empty prediction and truth") {
    val acc = Metrics.compare(ds(), ds(), beta = 0.5, totalPairWindows = 10)
    assert(acc.accuracy === 1.0 && acc.precision === 1.0 && acc.recall === 1.0)
  }

  test("degenerate zero pair-windows") {
    val acc = Metrics.compare(ds(), ds(), beta = 0.5, totalPairWindows = 0)
    assert(acc.accuracy === 1.0)
  }
}

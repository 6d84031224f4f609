package repro.exp

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.storage.StorageLevel

import repro.core._
import repro.data.ClimateData
import repro.naive.NaiveCorr
import repro.parcorr.ParCorr
import repro.tomborg.{Band, PowerLaw, Spectrum, Tomborg, TomborgSpec, White}
import repro.tsubasa.Tsubasa

/** The experiment harnesses behind every reproduced table (DESIGN.md §4).
  * Each returns plain row case classes so the bench suites, the
  * spark-submit jobs, and EXPERIMENTS.md all print the same numbers.
  */
object Experiments {

  /** Wall-clock seconds of ``f`` (after the caller has warmed inputs). */
  def time[T](f: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Best-of-``reps`` timing: GC between repetitions, keep the minimum —
    * standard on-JVM benchmarking hygiene (full GCs of a large driver heap
    * otherwise land randomly inside one competitor's run).
    */
  def timeBest[T](reps: Int)(f: => T): (T, Double) = {
    var best = Double.MaxValue
    var out: Option[T] = None
    var i = 0
    while (i < reps) {
      System.gc()
      val (r, sec) = time(f)
      if (sec < best) best = sec
      out = Some(r)
      i += 1
    }
    (out.get, best)
  }

  def fmtTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (cell, w) => cell.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"\n=== $title ===" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  /** The paper's evaluation workload: NCEI-USCRN-like hourly climate data,
    * 30-day windows sliding one day at daily basic windows.
    */
  def climateWorkload(spark: SparkSession, n: Int, hours: Int, beta: Double): (DataFrame, SlidingQuery) = {
    // Regions scale with the station count (~10 stations per region), as in
    // real station networks: the thresholded network is a sparse union of
    // regional cliques, the regime the paper's pruning targets.
    val nRegions = math.max(1, math.min(n, math.max(8, n / 10)))
    val values = ClimateData.hourly(spark,
      ClimateData.Spec(nStations = n, hours = hours, nRegions = nRegions))
    val q = SlidingQuery(start = 0L, end = hours.toLong, windowLen = 720, step = 24, beta = beta, bwSize = 24)
    (values, q)
  }

  // ------------------------------------------------------------------ T1

  final case class T1Row(framework: String, beta: Double, seconds: Double,
                         edges: Long, computedWindows: Long, skippedFrac: Double,
                         speedupVsTsubasa: Double, workRatioVsTsubasa: Double)

  /** Table 1 — pure query time, Dangoron vs TSUBASA (naive optional).
    * Sketches are prebuilt and cached for both frameworks, so the timed
    * section is the sliding query only ("pure query time").
    */
  def table1(spark: SparkSession, values: DataFrame, qBase: SlidingQuery,
             betas: Seq[Double], runNaive: Boolean): Seq[T1Row] = {
    val sketches = Sketch.build(values, qBase).persist(StorageLevel.MEMORY_AND_DISK)
    sketches.count() // materialize — sketch build excluded from query time
    val arrs =
      if (runNaive) Some { val a = Sketch.seriesArrays(values, qBase).persist(StorageLevel.MEMORY_AND_DISK); a.count(); a }
      else None
    // Warm-up run (JIT, codegen, shuffle setup) — not timed.
    locally { val (ds, _) = Dangoron.edges(sketches, qBase); ds.count() }
    locally { val (ds, _) = Tsubasa.edges(sketches, qBase); ds.count() }
    val reps = sys.env.getOrElse("BENCH_REPS", "3").toInt
    val rows = betas.flatMap { beta =>
      val q = qBase.copy(beta = beta)
      val (tres, tsubasaSec) = timeBest(reps) { val (ds, st) = Tsubasa.edges(sketches, q); (ds.count(), st()) }
      val (tsubasaEdges, tSt) = tres
      val (dres, dangoronSec) = timeBest(reps) { val (ds, st) = Dangoron.edges(sketches, q); (ds.count(), st()) }
      val (dangoronEdges, dSt) = dres
      val base = Seq(
        T1Row("TSUBASA", beta, tsubasaSec, tsubasaEdges, tSt.computedWindows, 0.0, 1.0, 1.0),
        T1Row("Dangoron", beta, dangoronSec, dangoronEdges, dSt.computedWindows,
          dSt.skippedFraction, tsubasaSec / dangoronSec,
          tSt.computedWindows.toDouble / math.max(1L, dSt.computedWindows)))
      val naiveRow = arrs.map { a =>
        val (nEdges, nSec) = time { NaiveCorr.edgesFromArrays(a, q).count() }
        T1Row("Naive", beta, nSec, nEdges, tSt.computedWindows, 0.0, tsubasaSec / nSec, 1.0)
      }
      base ++ naiveRow
    }
    sketches.unpersist()
    arrs.foreach(_.unpersist())
    rows
  }

  def printT1(rows: Seq[T1Row]): String =
    fmtTable("Table 1 — pure query time (s)",
      Seq("framework", "beta", "seconds", "edges", "computed pair-windows",
        "skipped%", "speedup vs TSUBASA", "work ratio vs TSUBASA"),
      rows.map(r => Seq(r.framework, f"${r.beta}%.2f", f"${r.seconds}%.3f",
        r.edges.toString, r.computedWindows.toString, f"${r.skippedFrac * 100}%.1f",
        f"${r.speedupVsTsubasa}%.2fx", f"${r.workRatioVsTsubasa}%.2fx")))

  // ------------------------------------------------------------------ T2

  final case class T2Row(framework: String, beta: Double, accuracy: Double,
                         precision: Double, recall: Double, f1: Double, maxCorrErr: Double)

  /** Table 2 — edge accuracy vs exact, Dangoron vs ParCorr. */
  def table2(spark: SparkSession, values: DataFrame, qBase: SlidingQuery,
             betas: Seq[Double], parcorrD: Int = 32): Seq[T2Row] = {
    val nPairs = {
      val n = values.select("sid").distinct().count()
      n * (n - 1) / 2
    }
    val truth = NaiveCorr.allCorrs(values, qBase).persist(StorageLevel.MEMORY_AND_DISK)
    truth.count()
    val sketches = Sketch.build(values, qBase).persist(StorageLevel.MEMORY_AND_DISK)
    sketches.count()
    val arrs = Sketch.seriesArrays(values, qBase).persist(StorageLevel.MEMORY_AND_DISK)
    arrs.count()
    val total = nPairs * qBase.numWindows
    val rows = betas.flatMap { beta =>
      val q = qBase.copy(beta = beta)
      val (dEdges, _) = Dangoron.edges(sketches, q)
      val dAcc = Metrics.compare(dEdges, truth, beta, total)
      val pEdges = ParCorr.edges(arrs, q, d = parcorrD)
      val pAcc = Metrics.compare(pEdges, truth, beta, total)
      Seq(
        T2Row("Dangoron", beta, dAcc.accuracy, dAcc.precision, dAcc.recall, dAcc.f1, dAcc.maxCorrErrOnHits),
        T2Row(s"ParCorr(d=$parcorrD)", beta, pAcc.accuracy, pAcc.precision, pAcc.recall, pAcc.f1, pAcc.maxCorrErrOnHits))
    }
    truth.unpersist(); sketches.unpersist(); arrs.unpersist()
    rows
  }

  def printT2(rows: Seq[T2Row]): String =
    fmtTable("Table 2 — accuracy vs exact",
      Seq("framework", "beta", "accuracy", "precision", "recall", "F1", "max corr err (TP)"),
      rows.map(r => Seq(r.framework, f"${r.beta}%.2f", f"${r.accuracy * 100}%.2f%%",
        f"${r.precision}%.4f", f"${r.recall}%.4f", f"${r.f1}%.4f", f"${r.maxCorrErr}%.4f")))

  // ------------------------------------------------------------------ T3

  final case class T3Row(spectrum: String, framework: String, seconds: Double,
                         accuracy: Double, f1: Double)

  /** Table 3 — robustness across Tomborg spectral distributions. */
  def table3(spark: SparkSession, n: Int, len: Int, beta: Double,
             spectra: Seq[(String, Spectrum)]): Seq[T3Row] = {
    spectra.flatMap { case (name, spec) =>
      val tspec = TomborgSpec(n = n, len = len, clusters = 8, rho = 0.8, spectrum = spec)
      val values = Tomborg.generate(spark, tspec).persist(StorageLevel.MEMORY_AND_DISK)
      values.count()
      val q = SlidingQuery(0L, len.toLong, windowLen = len / 8, step = len / 64, beta = beta, bwSize = len / 64)
      val nPairs = n.toLong * (n - 1) / 2
      val total = nPairs * q.numWindows
      val truth = NaiveCorr.allCorrs(values, q).persist(StorageLevel.MEMORY_AND_DISK)
      truth.count()
      val sketches = Sketch.build(values, q).persist(StorageLevel.MEMORY_AND_DISK)
      sketches.count()
      val arrs = Sketch.seriesArrays(values, q).persist(StorageLevel.MEMORY_AND_DISK)
      arrs.count()
      val (dEdges, dSec) = time { val (ds, _) = Dangoron.edges(sketches, q); val c = ds.persist(); c.count(); c }
      val dAcc = Metrics.compare(dEdges, truth, beta, total)
      val (tEdges, tSec) = time { val (ds, _) = Tsubasa.edges(sketches, q); val c = ds.persist(); c.count(); c }
      val tAcc = Metrics.compare(tEdges, truth, beta, total)
      val (pEdges, pSec) = time { val ds = ParCorr.edges(arrs, q).persist(); ds.count(); ds }
      val pAcc = Metrics.compare(pEdges, truth, beta, total)
      val rows = Seq(
        T3Row(name, "Dangoron", dSec, dAcc.accuracy, dAcc.f1),
        T3Row(name, "TSUBASA", tSec, tAcc.accuracy, tAcc.f1),
        T3Row(name, "ParCorr", pSec, pAcc.accuracy, pAcc.f1))
      Seq(dEdges, tEdges, pEdges).foreach(_.unpersist())
      truth.unpersist(); sketches.unpersist(); arrs.unpersist(); values.unpersist()
      rows
    }
  }

  def printT3(rows: Seq[T3Row]): String =
    fmtTable("Table 3 — robustness across Tomborg spectra (β fixed)",
      Seq("spectrum", "framework", "seconds", "accuracy", "F1"),
      rows.map(r => Seq(r.spectrum, r.framework, f"${r.seconds}%.3f",
        f"${r.accuracy * 100}%.2f%%", f"${r.f1}%.4f")))

  // ------------------------------------------------------------------ T4

  final case class T4Row(beta: Double, computedWindows: Long, skippedWindows: Long,
                         skippedFrac: Double, horizPrunedPairs: Long, horizComputedPairs: Long)

  /** Table 4 — pruning power: Eq. 2 window skips + horizontal (triangle)
    * pair pruning at the first window.
    */
  def table4(spark: SparkSession, values: DataFrame, qBase: SlidingQuery,
             betas: Seq[Double], pivot: Int = 0): Seq[T4Row] = {
    val sketches = Sketch.build(values, qBase).persist(StorageLevel.MEMORY_AND_DISK)
    sketches.count()
    val rows = betas.map { beta =>
      val q = qBase.copy(beta = beta)
      val (ds, stats) = Dangoron.edges(sketches, q)
      ds.count()
      val st = stats()
      val hp = HorizontalPrune.edgesForWindow(sketches, q, w = 0, pivot = pivot)
      T4Row(beta, st.computedWindows, st.skippedWindows, st.skippedFraction,
        hp.prunedPairs, hp.computedPairs)
    }
    sketches.unpersist()
    rows
  }

  def printT4(rows: Seq[T4Row]): String =
    fmtTable("Table 4 — pruning power",
      Seq("beta", "computed windows", "skipped windows", "skipped%", "horiz pruned pairs (w=0)", "horiz computed pairs (w=0)"),
      rows.map(r => Seq(f"${r.beta}%.2f", r.computedWindows.toString, r.skippedWindows.toString,
        f"${r.skippedFrac * 100}%.1f", r.horizPrunedPairs.toString, r.horizComputedPairs.toString)))

  /** The Tomborg spectra used by Table 3. */
  def defaultSpectra(len: Int): Seq[(String, Spectrum)] = Seq(
    ("white", White),
    ("1/f^1.5", PowerLaw(1.5)),
    ("band[2,16]", Band(2, 16)))
}

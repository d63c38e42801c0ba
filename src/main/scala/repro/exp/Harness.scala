package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data._
import repro.metrics.Metrics

/** Shared experiment machinery for the evaluation-figure tables.
  *
  * Spark generates and stratifies each dataset once (cached per JVM);
  * the Monte-Carlo trial loops then run through the local engine — the
  * same algorithm as the Spark engine (tested identical), with the cost
  * unit (oracle invocations) charged by [[repro.data.CountingOracle]].
  *
  * Knobs (environment): `ABAE_BENCH_TRIALS` scales every trial count,
  * `ABAE_BENCH_SF` scales dataset sizes (1.0 = paper sizes).
  */
object Harness {

  /** Trial count for a figure, scaled by ABAE_BENCH_TRIALS / 300. */
  def trials(default: Int): Int = {
    val scale = sys.env.get("ABAE_BENCH_TRIALS").map(_.toDouble / 300.0).getOrElse(1.0)
    math.max(10, math.round(default * scale).toInt)
  }

  def sf: Double = sys.env.get("ABAE_BENCH_SF").map(_.toDouble).getOrElse(1.0)

  // ------------------------------------------------------------- data cache

  private val recordCache = scala.collection.mutable.Map.empty[(String, Double), LocalRecords]
  private val stratCache = scala.collection.mutable.Map.empty[(String, Double, Int), StratifiedLocal]

  /** Generate-and-collect a profile once per (name, sf). */
  def records(spark: SparkSession, profile: Datasets.Profile): LocalRecords =
    recordCache.getOrElseUpdate((profile.name, sf), Datasets.local(spark, profile, sf))

  def stratified(spark: SparkSession, profile: Datasets.Profile, k: Int): StratifiedLocal =
    stratCache.getOrElseUpdate((profile.name, sf, k),
      StratifiedLocal(records(spark, profile), k))

  /** Stratify an explicit record set with caching under a label. */
  def stratifiedOf(label: String, rec: LocalRecords, k: Int): StratifiedLocal =
    stratCache.getOrElseUpdate((label, sf, k), StratifiedLocal(rec, k))

  // ------------------------------------------------------------ trial loops

  def abaeEstimates(
      strat: StratifiedLocal,
      budget: Int,
      nTrials: Int,
      params: AbaeParams,
      seedBase: Long,
  ): Vector[Double] =
    Vector.tabulate(nTrials) { t =>
      Abae.run(strat, new CountingOracle(strat), budget, params, seedBase + t).estimate
    }

  def uniformEstimates(
      rec: LocalRecords,
      budget: Int,
      nTrials: Int,
      seedBase: Long,
  ): Vector[Double] =
    Vector.tabulate(nTrials)(t => UniformSampling.run(rec, budget, seedBase + t).estimate)

  /** (RMSE, stddev of absolute error) — the paper's line + shaded band. */
  def rmseAndStd(estimates: Seq[Double], truth: Double): (Double, Double) =
    (Metrics.rmse(estimates, truth), Metrics.stddev(estimates.map(e => math.abs(e - truth))))

  // ---------------------------------------------------------------- tables

  /** Fixed-width ASCII table, one row per condition. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"\n=== $title ===" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def f4(d: Double): String = f"$d%.4f"
  def f2(d: Double): String = f"$d%.2f"
}

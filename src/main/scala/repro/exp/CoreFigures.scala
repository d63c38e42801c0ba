package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.Datasets
import repro.metrics.Metrics
import repro.sampling.Rng

/** Single-predicate evaluation artifacts: Figures 2, 3, 4, 5, 9, 10, 11.
  * Each `figN` returns typed per-condition rows; bench suites assert the
  * paper's qualitative claims on them and print the rendered table.
  */
object CoreFigures {

  val PaperBudgets: Seq[Int] = Seq(2000, 4000, 6000, 8000, 10000)
  val LowBudgets: Seq[Int] = Seq(500, 750, 1000)
  val DefaultParams: AbaeParams = AbaeParams(k = 5, stage1Frac = 0.5)

  // ------------------------------------------------------------ Fig 2 and 3

  /** One (dataset, budget) cell of the budget-vs-RMSE comparison. */
  final case class RmseCell(
      dataset: String,
      budget: Int,
      abaeRmse: Double,
      abaeStd: Double,
      unifRmse: Double,
      unifStd: Double,
  ) {
    def gain: Double = unifRmse / abaeRmse
  }

  def rmseSweep(
      spark: SparkSession,
      budgets: Seq[Int],
      nTrials: Int,
      profiles: Seq[Datasets.Profile] = Datasets.all,
  ): Vector[RmseCell] =
    profiles.toVector.flatMap { p =>
      val rec = Harness.records(spark, p)
      val strat = Harness.stratified(spark, p, DefaultParams.k)
      val truth = rec.truth
      budgets.map { b =>
        val (ar, as) = Harness.rmseAndStd(
          Harness.abaeEstimates(strat, b, nTrials, DefaultParams, 1000L * b), truth)
        val (ur, us) = Harness.rmseAndStd(
          Harness.uniformEstimates(rec, b, nTrials, 5000L * b), truth)
        RmseCell(p.name, b, ar, as, ur, us)
      }
    }

  def fig2(spark: SparkSession, nTrials: Int): Vector[RmseCell] =
    rmseSweep(spark, PaperBudgets, nTrials)

  def fig3(spark: SparkSession, nTrials: Int): Vector[RmseCell] =
    rmseSweep(spark, LowBudgets, nTrials)

  def renderRmse(title: String, cells: Seq[RmseCell]): String =
    Harness.render(title,
      Seq("dataset", "budget", "abae_rmse", "abae_std", "uniform_rmse", "uniform_std", "gain"),
      cells.map(c => Seq(c.dataset, c.budget.toString, Harness.f4(c.abaeRmse),
        Harness.f4(c.abaeStd), Harness.f4(c.unifRmse), Harness.f4(c.unifStd),
        Harness.f2(c.gain) + "x")))

  // ------------------------------------------------------------------ Fig 4

  /** Normalized Q-error (100·(q−1)) per (dataset, budget). */
  final case class QErrorCell(
      dataset: String,
      budget: Int,
      abaeQ: Double,
      unifQ: Double,
  )

  def fig4(
      spark: SparkSession,
      nTrials: Int,
      profiles: Seq[Datasets.Profile] = Seq(Datasets.nightStreet, Datasets.amazonOffice),
  ): Vector[QErrorCell] =
    profiles.toVector.flatMap { p =>
      val rec = Harness.records(spark, p)
      val strat = Harness.stratified(spark, p, DefaultParams.k)
      val truth = rec.truth
      PaperBudgets.map { b =>
        val a = Metrics.normalizedQError(
          Harness.abaeEstimates(strat, b, nTrials, DefaultParams, 1000L * b), truth)
        val u = Metrics.normalizedQError(
          Harness.uniformEstimates(rec, b, nTrials, 5000L * b), truth)
        QErrorCell(p.name, b, a, u)
      }
    }

  def renderQ(cells: Seq[QErrorCell]): String =
    Harness.render("T-fig4: budget vs normalized Q-error (100*(q-1))",
      Seq("dataset", "budget", "abae_qerr", "uniform_qerr"),
      cells.map(c => Seq(c.dataset, c.budget.toString, Harness.f2(c.abaeQ), Harness.f2(c.unifQ))))

  // ------------------------------------------------------------------ Fig 5

  /** CI width and empirical coverage per (dataset, budget). */
  final case class CiCell(
      dataset: String,
      budget: Int,
      abaeWidth: Double,
      abaeCoverage: Double,
      unifWidth: Double,
      unifCoverage: Double,
  )

  def fig5(
      spark: SparkSession,
      nTrials: Int,
      beta: Int = 300,
      budgets: Seq[Int] = Seq(2000, 6000, 10000),
      profiles: Seq[Datasets.Profile] = Datasets.all,
  ): Vector[CiCell] =
    profiles.toVector.flatMap { p =>
      val rec = Harness.records(spark, p)
      val strat = Harness.stratified(spark, p, DefaultParams.k)
      val truth = rec.truth
      budgets.map { b =>
        var aw = 0.0; var ac = 0; var uw = 0.0; var uc = 0
        for (t <- 1 to nTrials) {
          val res = Abae.run(strat, new repro.data.CountingOracle(strat), b,
            DefaultParams, 17L * b + t)
          val ci = Bootstrap.ci(res.draws, beta, alpha = 0.05, Rng.stream(31L * b + t, 1))
          aw += ci.width; if (ci.contains(truth)) ac += 1
          val ur = UniformSampling.run(rec, b, 73L * b + t)
          val uci = UniformSampling.ci(ur, beta, 0.05, Rng.stream(91L * b + t, 2))
          uw += uci.width; if (uci.contains(truth)) uc += 1
        }
        CiCell(p.name, b, aw / nTrials, ac.toDouble / nTrials, uw / nTrials, uc.toDouble / nTrials)
      }
    }

  def renderCi(cells: Seq[CiCell]): String =
    Harness.render("T-fig5: budget vs 95% CI width and empirical coverage",
      Seq("dataset", "budget", "abae_width", "abae_cover", "unif_width", "unif_cover"),
      cells.map(c => Seq(c.dataset, c.budget.toString, Harness.f4(c.abaeWidth),
        Harness.f2(c.abaeCoverage), Harness.f4(c.unifWidth), Harness.f2(c.unifCoverage))))

  // ------------------------------------------------------------------ Fig 9

  /** Lesion study at budget 10,000: full ABAE, ABAE without sample reuse,
    * uniform sampling.
    */
  final case class LesionCell(
      dataset: String,
      abaeRmse: Double,
      noReuseRmse: Double,
      unifRmse: Double,
  )

  def fig9(spark: SparkSession, nTrials: Int, budget: Int = 10000): Vector[LesionCell] =
    Datasets.all.toVector.map { p =>
      val rec = Harness.records(spark, p)
      val strat = Harness.stratified(spark, p, DefaultParams.k)
      val truth = rec.truth
      val full = Metrics.rmse(
        Harness.abaeEstimates(strat, budget, nTrials, DefaultParams, 111L), truth)
      val noReuse = Metrics.rmse(
        Harness.abaeEstimates(strat, budget, nTrials,
          DefaultParams.copy(reuse = false), 222L), truth)
      val unif = Metrics.rmse(Harness.uniformEstimates(rec, budget, nTrials, 333L), truth)
      LesionCell(p.name, full, noReuse, unif)
    }

  def renderLesion(cells: Seq[LesionCell]): String =
    Harness.render("T-fig9: lesion study @ N=10000 (RMSE)",
      Seq("dataset", "abae", "no_sample_reuse", "uniform"),
      cells.map(c => Seq(c.dataset, Harness.f4(c.abaeRmse),
        Harness.f4(c.noReuseRmse), Harness.f4(c.unifRmse))))

  // ----------------------------------------------------------------- Fig 10

  /** Sensitivity to the number of strata K (uniform baseline alongside). */
  final case class KCell(dataset: String, k: Int, abaeRmse: Double, unifRmse: Double)

  def fig10(
      spark: SparkSession,
      nTrials: Int,
      ks: Seq[Int] = 2 to 10,
      budget: Int = 10000,
  ): Vector[KCell] =
    Datasets.all.toVector.flatMap { p =>
      val rec = Harness.records(spark, p)
      val truth = rec.truth
      val unif = Metrics.rmse(Harness.uniformEstimates(rec, budget, nTrials, 444L), truth)
      ks.map { k =>
        val strat = Harness.stratified(spark, p, k)
        val a = Metrics.rmse(
          Harness.abaeEstimates(strat, budget, nTrials, AbaeParams(k = k), 555L + k), truth)
        KCell(p.name, k, a, unif)
      }
    }

  def renderK(cells: Seq[KCell]): String =
    Harness.render("T-fig10: sensitivity to number of strata K @ N=10000 (RMSE)",
      Seq("dataset", "K", "abae_rmse", "uniform_rmse"),
      cells.map(c => Seq(c.dataset, c.k.toString, Harness.f4(c.abaeRmse), Harness.f4(c.unifRmse))))

  // ----------------------------------------------------------------- Fig 11

  /** Sensitivity to the Stage-1 budget fraction C. */
  final case class CCell(dataset: String, c: Double, abaeRmse: Double, unifRmse: Double)

  def fig11(
      spark: SparkSession,
      nTrials: Int,
      cs: Seq[Double] = Seq(0.1, 0.3, 0.5, 0.7, 0.9),
      budget: Int = 10000,
  ): Vector[CCell] =
    Datasets.all.toVector.flatMap { p =>
      val rec = Harness.records(spark, p)
      val strat = Harness.stratified(spark, p, 5)
      val truth = rec.truth
      val unif = Metrics.rmse(Harness.uniformEstimates(rec, budget, nTrials, 666L), truth)
      cs.map { c =>
        val a = Metrics.rmse(
          Harness.abaeEstimates(strat, budget, nTrials,
            AbaeParams(k = 5, stage1Frac = c), 777L + (c * 10).toInt), truth)
        CCell(p.name, c, a, unif)
      }
    }

  def renderC(cells: Seq[CCell]): String =
    Harness.render("T-fig11: sensitivity to stage-1 fraction C @ N=10000 (RMSE)",
      Seq("dataset", "C", "abae_rmse", "uniform_rmse"),
      cells.map(c => Seq(c.dataset, c.c.toString, Harness.f4(c.abaeRmse), Harness.f4(c.unifRmse))))
}

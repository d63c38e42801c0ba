package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data._
import repro.metrics.Metrics

/** Extension evaluation artifacts: Figures 6 (MultiPred), 7–8 (GroupBy),
  * 12 (proxy combination).
  */
object ExtFigures {

  import CoreFigures.DefaultParams

  // ------------------------------------------------------------------ Fig 6

  final case class MultiPredCell(
      query: String,
      budget: Int,
      abaeRmse: Double,
      unifRmse: Double,
  )

  private var multiPredCache: Map[String, LocalRecords] = Map.empty

  /** The two Fig-6 queries lowered to single-predicate records:
    * night-street `cars AND red_light`, and the Beta-rates synthetic.
    */
  def multiPredDatasets(spark: SparkSession): Map[String, LocalRecords] = {
    if (multiPredCache.isEmpty) {
      val ns = MultiPred.lower(And(Pred("cars"), Pred("red")),
        ExtDatasets.collectMultiPred(
          ExtDatasets.nightStreetMultiPred(spark, Harness.sf), Vector("cars", "red")))
      val synthRows = math.max(1000L, (100000 * Harness.sf).toLong)
      val sy = MultiPred.lower(And(Pred("a"), Pred("b")),
        ExtDatasets.collectMultiPred(
          ExtDatasets.syntheticMultiPred(spark, rows = synthRows), Vector("a", "b")))
      multiPredCache = Map("night-street(cars&red)" -> ns, "synthetic(2-pred)" -> sy)
    }
    multiPredCache
  }

  def fig6(
      spark: SparkSession,
      nTrials: Int,
      budgets: Seq[Int] = CoreFigures.PaperBudgets,
  ): Vector[MultiPredCell] =
    multiPredDatasets(spark).toVector.flatMap { case (name, rec) =>
      val strat = Harness.stratifiedOf(s"multipred-$name", rec, DefaultParams.k)
      val truth = rec.truth
      budgets.map { b =>
        val a = Metrics.rmse(
          Harness.abaeEstimates(strat, b, nTrials, DefaultParams, 10L * b), truth)
        val u = Metrics.rmse(Harness.uniformEstimates(rec, b, nTrials, 20L * b), truth)
        MultiPredCell(name, b, a, u)
      }
    }

  def renderMultiPred(cells: Seq[MultiPredCell]): String =
    Harness.render("T-fig6: ABAE-MultiPred vs uniform (RMSE)",
      Seq("query", "budget", "abae_rmse", "uniform_rmse", "gain"),
      cells.map(c => Seq(c.query, c.budget.toString, Harness.f4(c.abaeRmse),
        Harness.f4(c.unifRmse), Harness.f2(c.unifRmse / c.abaeRmse) + "x")))

  // -------------------------------------------------------------- Figs 7 & 8

  final case class GroupByCell(
      query: String,
      budgetPerGroup: Int,
      abaeMaxRmse: Double,
      unifMaxRmse: Double,
  )

  private var groupByCache: Map[String, GroupedRecords] = Map.empty

  private def groupByDataset(spark: SparkSession, key: String): GroupedRecords = {
    if (!groupByCache.contains(key)) {
      val rec = key match {
        case "celeba(hair)" =>
          ExtDatasets.collectGrouped(
            ExtDatasets.celebaGroupBy(spark, Harness.sf), Vector("gray", "blond"))
        case "synthetic(3.3-3.5%)" =>
          ExtDatasets.collectGrouped(
            ExtDatasets.syntheticGroupBySingle(spark,
              rows = math.max(1000L, (200000 * Harness.sf).toLong)),
            Vector("g1", "g2", "g3", "g4"))
        case "synthetic(16/12/9/5%)" =>
          ExtDatasets.collectGrouped(
            ExtDatasets.syntheticGroupByMulti(spark,
              rows = math.max(1000L, (200000 * Harness.sf).toLong)),
            Vector("g1", "g2", "g3", "g4"))
      }
      groupByCache += key -> rec
    }
    groupByCache(key)
  }

  private def maxRmse(runs: Seq[Vector[Double]], truth: Vector[Double]): Double =
    truth.indices.map(g => Metrics.rmse(runs.map(_(g)), truth(g))).max

  /** Fig 7: single-oracle group-by, max-RMSE vs budget normalized by the
    * number of groups.
    */
  def fig7(
      spark: SparkSession,
      nTrials: Int,
      budgetsPerGroup: Seq[Int] = Seq(500, 1000, 1500, 2000),
  ): Vector[GroupByCell] =
    Vector("celeba(hair)", "synthetic(3.3-3.5%)").flatMap { key =>
      val rec = groupByDataset(spark, key)
      budgetsPerGroup.map { bpg =>
        val budget = bpg * rec.g
        val abae = maxRmse((1 to nTrials).map(t =>
          GroupBy.runSingleOracle(rec, budget, GroupBy.GroupByParams(k = 5), 40L * budget + t)
            .estimates), rec.truth)
        val unif = maxRmse((1 to nTrials).map(t =>
          GroupBy.uniformSingleOracle(rec, budget, 50L * budget + t).estimates), rec.truth)
        GroupByCell(key, bpg, abae, unif)
      }
    }

  /** Fig 8: multi-oracle group-by, max-RMSE vs budget normalized by the
    * number of groups. K follows the paper's rule (§3.1): maximal such
    * that every stratum receives ≥100 Stage-1 samples — each group's
    * pilot here is only its own `bpg·C` draws, so small budgets use
    * fewer strata.
    */
  def fig8(
      spark: SparkSession,
      nTrials: Int,
      budgetsPerGroup: Seq[Int] = Seq(500, 1000, 1500, 2000),
  ): Vector[GroupByCell] =
    Vector("celeba(hair)", "synthetic(16/12/9/5%)").flatMap { key =>
      val rec = groupByDataset(spark, key)
      budgetsPerGroup.map { bpg =>
        val budget = bpg * rec.g
        val k = math.min(5, math.max(2, (bpg * 0.5 / 100).toInt))
        val abae = maxRmse((1 to nTrials).map(t =>
          GroupBy.runMultiOracle(rec, budget, GroupBy.GroupByParams(k = k), 60L * budget + t)
            .estimates), rec.truth)
        val unif = maxRmse((1 to nTrials).map(t =>
          GroupBy.uniformMultiOracle(rec, budget, 70L * budget + t).estimates), rec.truth)
        GroupByCell(key, bpg, abae, unif)
      }
    }

  def renderGroupBy(title: String, cells: Seq[GroupByCell]): String =
    Harness.render(title,
      Seq("query", "budget/group", "abae_max_rmse", "uniform_max_rmse", "gain"),
      cells.map(c => Seq(c.query, c.budgetPerGroup.toString, Harness.f4(c.abaeMaxRmse),
        Harness.f4(c.unifMaxRmse), Harness.f2(c.unifMaxRmse / c.abaeMaxRmse) + "x")))

  // ----------------------------------------------------------------- Fig 12

  final case class CombineCell(
      dataset: String,
      budget: Int,
      unifRmse: Double,
      bestSingleRmse: Double,
      worstSingleRmse: Double,
      combinedRmse: Double,
  )

  private var combineCache: Map[String, (Array[Boolean], Array[Double], Vector[Array[Double]])] =
    Map.empty

  private def combineDataset(spark: SparkSession, key: String)
      : (Array[Boolean], Array[Double], Vector[Array[Double]]) = {
    if (!combineCache.contains(key)) {
      val data = key match {
        case "trec05p(keywords)" =>
          ExtDatasets.collectMultiProxy(ExtDatasets.trec05pMultiProxy(spark, Harness.sf),
            Vector("proxy_kw1", "proxy_kw2", "proxy_kw3", "proxy_junk"))
        case "synthetic(noisy-theta)" =>
          ExtDatasets.collectMultiProxy(
            ExtDatasets.syntheticMultiProxy(spark,
              rows = math.max(1000L, (100000 * Harness.sf).toLong)),
            Vector("proxy_p1", "proxy_p2", "proxy_p3"))
      }
      combineCache += key -> data
    }
    combineCache(key)
  }

  def fig12(
      spark: SparkSession,
      nTrials: Int,
      budgets: Seq[Int] = Seq(2000, 6000, 10000),
  ): Vector[CombineCell] =
    Vector("trec05p(keywords)", "synthetic(noisy-theta)").flatMap { key =>
      val (positive, stat, proxies) = combineDataset(spark, key)
      val rec0 = LocalRecords(proxies.head, positive, stat)
      val truth = rec0.truth
      // Per-proxy single-proxy ABAE RMSE; best/worst reported.
      budgets.map { b =>
        val singles = proxies.zipWithIndex.map { case (pr, j) =>
          val strat = Harness.stratifiedOf(s"combine-$key-p$j", LocalRecords(pr, positive, stat), 5)
          Metrics.rmse(
            Harness.abaeEstimates(strat, b, nTrials, DefaultParams, 80L * b + j), truth)
        }
        val combined = Metrics.rmse((1 to nTrials).map(t =>
          ProxyCombiner.run(positive, stat, proxies, b, DefaultParams, 90L * b + t).estimate),
          truth)
        val unif = Metrics.rmse(
          Harness.uniformEstimates(rec0, b, nTrials, 95L * b), truth)
        CombineCell(key, b, unif, singles.min, singles.max, combined)
      }
    }

  def renderCombine(cells: Seq[CombineCell]): String =
    Harness.render("T-fig12: combining proxies via logistic regression (RMSE)",
      Seq("dataset", "budget", "uniform", "best_single", "worst_single", "combined"),
      cells.map(c => Seq(c.dataset, c.budget.toString, Harness.f4(c.unifRmse),
        Harness.f4(c.bestSingleRmse), Harness.f4(c.worstSingleRmse),
        Harness.f4(c.combinedRmse))))
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{CountingOracle, LocalRecords, StratifiedLocal}
import repro.metrics.Metrics
import scala.util.Random

/** Numeric validation of the paper's theory (§4): Proposition 1
  * (optimal allocation), Proposition 2 (its MSE), the uniform-sampling
  * rate, the K-fold separation example, and the Theorem 4.1 rate.
  */
class TheorySpec extends AnyFunSuite {

  // --------------------------------------------------------- Proposition 1

  test("Prop 1: T* minimizes the deterministic-draw MSE over the simplex") {
    val rng = new Random(0)
    for (trial <- 1 to 20) {
      val k = 2 + rng.nextInt(5)
      val p = Array.fill(k)(0.02 + rng.nextDouble() * 0.9)
      val s = Array.fill(k)(0.1 + rng.nextDouble() * 3)
      val tStar = Estimators.allocation(p, s)
      val best = Estimators.allocationMse(p, s, tStar, 1000.0)
      for (_ <- 1 to 50) {
        // random perturbation projected back to the simplex
        val t = tStar.map(x => math.max(1e-6, x + rng.nextGaussian() * 0.05))
        val norm = t.sum
        val mse = Estimators.allocationMse(p, s, t.map(_ / norm), 1000.0)
        assert(mse >= best - 1e-12, s"trial $trial: perturbed $mse < optimal $best")
      }
    }
  }

  test("Prop 1: T* downweights importance sampling by sqrt(p)") {
    // vs classic Neyman allocation ∝ p_k σ_k: with equal σ, T* ∝ √p.
    val t = Estimators.allocation(Array(0.04, 0.16, 0.64), Array(1.0, 1.0, 1.0))
    // √p = (0.2, 0.4, 0.8) normalized = (1/7, 2/7, 4/7)
    assert(math.abs(t(0) - 1.0 / 7) < 1e-12)
    assert(math.abs(t(1) - 2.0 / 7) < 1e-12)
    assert(math.abs(t(2) - 4.0 / 7) < 1e-12)
  }

  // --------------------------------------------------------- Proposition 2

  test("Prop 2: closed-form MSE matches Monte-Carlo in the deterministic-draw setting") {
    val rng = new Random(1)
    val p = Array(0.2, 0.5, 0.8)
    val sigma = Array(1.0, 2.0, 0.5)
    val mu = Array(3.0, 5.0, 7.0)
    val n = 600
    val tStar = Estimators.allocation(p, sigma)
    val pAll = p.sum
    val truth = p.indices.map(i => p(i) * mu(i)).sum / pAll

    // Deterministic draws: stratum k yields exactly round(p_k T_k N)
    // positive samples ~ N(mu_k, sigma_k²); weights use the TRUE p_k
    // (perfect information), matching the proposition's setting.
    val trials = 4000
    val sqErrs = (1 to trials).map { _ =>
      val est = p.indices.map { i =>
        val b = math.max(1, math.round(p(i) * tStar(i) * n).toInt)
        val muHat = (1 to b).map(_ => mu(i) + rng.nextGaussian() * sigma(i)).sum / b
        p(i) * muHat
      }.sum / pAll
      (est - truth) * (est - truth)
    }
    val mc = sqErrs.sum / trials
    val closed = Estimators.prop2Mse(p, sigma, n.toDouble)
    // MC error of the MSE itself is a few percent at 4000 trials; the
    // rounding of B_k adds a little more.
    assert(math.abs(mc - closed) / closed < 0.15, s"mc=$mc closed=$closed")
  }

  test("Prop 2 example: uniform sampling converges K-fold slower when one stratum holds all positives") {
    // p_1..pK = (1,0,..,0), σ = 1: stratified MSE = 1/N vs uniform σ²/(N·p_avg) = K/N.
    val k = 5
    val p = Array.tabulate(k)(i => if (i == k - 1) 1.0 else 0.0)
    val sigma = Array.fill(k)(1.0)
    val stratMse = Estimators.prop2Mse(p, sigma, 1000.0)
    val uniformMse = 1.0 / (1000.0 * (p.sum / k)) // σ²/(N·p_avg)
    assert(math.abs(stratMse - 1.0 / 1000.0) < 1e-12)
    assert(math.abs(uniformMse / stratMse - k) < 1e-9)
  }

  test("empirical K-fold example: ABAE beats uniform by ≈ √K in RMSE") {
    // Perfect proxy: positives all in the top stratum, σ = 1 everywhere.
    val rng = new Random(2)
    val n = 50000
    val k = 5
    val proxy = Array.tabulate(n)(i => i.toDouble / n)
    val positive = proxy.map(_ >= 0.8) // exactly the top ntile stratum
    val stat = Array.fill(n)(rng.nextGaussian() + 10)
    val rec = LocalRecords(proxy, positive, stat)
    val strat = StratifiedLocal(rec, k)
    val trials = 250
    val budget = 600
    val abae = Metrics.rmse((1 to trials).map(s =>
      Abae.run(strat, new CountingOracle(strat), budget, AbaeParams(k = k), s).estimate),
      strat.truth)
    val unif = Metrics.rmse((1 to trials).map(s =>
      UniformSampling.run(rec, budget, s).estimate), rec.truth)
    val ratio = unif / abae
    // Ideal rate gap K=5 in MSE → √5 ≈ 2.24 in RMSE; ABAE spends half its
    // budget piloting, so accept anything safely above √(K)/2.
    assert(ratio > 1.4, s"ratio=$ratio abae=$abae uniform=$unif")
  }

  // ----------------------------------------------------------- Theorem 4.1

  test("Theorem 4.1: MSE decays at ~1/N (RMSE halves per 4x budget)") {
    val rng = new Random(3)
    val n = 120000
    val proxy = Array.fill(n)(rng.nextDouble())
    val positive = proxy.map(p => rng.nextDouble() < p * 0.6)
    val stat = proxy.map(p => 2.0 + 6.0 * p + rng.nextGaussian())
    val strat = StratifiedLocal(LocalRecords(proxy, positive, stat), 5)
    def rmseAt(budget: Int): Double =
      Metrics.rmse((1 to 250).map(s =>
        Abae.run(strat, new CountingOracle(strat), budget, AbaeParams(), 1000 + s).estimate),
        strat.truth)
    val r1 = rmseAt(800)
    val r4 = rmseAt(3200)
    val ratio = r1 / r4
    // 1/N MSE decay → RMSE ratio 2 for a 4x budget; Monte-Carlo noise and
    // the without-replacement correction put it in a band around 2.
    assert(ratio > 1.5 && ratio < 3.0, s"ratio=$ratio (r800=$r1 r3200=$r4)")
  }

  test("strata with vanishing p_k do not break convergence (Prop 3/4 regime)") {
    // Bottom strata have p_k ~ 1e-4 — pilots often see zero positives.
    val rng = new Random(4)
    val n = 100000
    val proxy = Array.tabulate(n)(i => i.toDouble / n)
    val positive = proxy.map(p => rng.nextDouble() < (if (p < 0.6) 1e-4 else 0.9))
    val stat = Array.fill(n)(rng.nextGaussian() * 2 + 20)
    val strat = StratifiedLocal(LocalRecords(proxy, positive, stat), 5)
    val ests = (1 to 150).map(s =>
      Abae.run(strat, new CountingOracle(strat), 2000, AbaeParams(), s).estimate)
    val rmse = Metrics.rmse(ests, strat.truth)
    assert(rmse < 0.5, s"rmse=$rmse truth=${strat.truth}")
  }

  test("optimal allocation beats proportional (uniform-share) allocation in closed form") {
    val p = Array(0.01, 0.1, 0.9)
    val sigma = Array(0.5, 3.0, 1.0)
    val uniformShare = Array.fill(3)(1.0 / 3)
    val tStar = Estimators.allocation(p, sigma)
    val n = 2000.0
    assert(Estimators.allocationMse(p, sigma, tStar, n) <
      Estimators.allocationMse(p, sigma, uniformShare, n))
  }
}

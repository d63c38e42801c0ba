package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{CountingOracle, LocalRecords, StratifiedLocal}
import repro.sampling.Rng
import scala.util.Random

class BootstrapSpec extends AnyFunSuite {

  private def draws(pairs: (Boolean, Double)*): StratumDraws =
    StratumDraws(pairs.map(_._1).toArray, pairs.map(_._2).toArray)

  // ------------------------------------------------------------- percentile

  test("percentile interpolates linearly") {
    val xs = Array(0.0, 1.0, 2.0, 3.0, 4.0)
    assert(Bootstrap.percentile(xs, 0.0) == 0.0)
    assert(Bootstrap.percentile(xs, 1.0) == 4.0)
    assert(Bootstrap.percentile(xs, 0.5) == 2.0)
    assert(math.abs(Bootstrap.percentile(xs, 0.625) - 2.5) < 1e-12)
  }

  test("percentile of a single element is that element") {
    assert(Bootstrap.percentile(Array(7.0), 0.25) == 7.0)
  }

  // ----------------------------------------------------------------- ci

  test("ci brackets the point estimate of a well-behaved sample") {
    val rng = new Random(0)
    val d = draws(Seq.fill(500)((rng.nextDouble() < 0.5, rng.nextGaussian() + 10)): _*)
    val est = Estimators.combine(Seq(Estimators.fromDraws(d)))
    val ci = Bootstrap.ci(Seq(d), beta = 500, alpha = 0.05, new Random(1))
    assert(ci.contains(est), s"ci=$ci est=$est")
    assert(ci.width > 0)
  }

  test("ci width shrinks with more samples") {
    def widthFor(n: Int): Double = {
      val rng = new Random(2)
      val d = draws(Seq.fill(n)((rng.nextDouble() < 0.5, rng.nextGaussian() + 10)): _*)
      Bootstrap.ci(Seq(d), 400, 0.05, new Random(3)).width
    }
    assert(widthFor(4000) < widthFor(250))
  }

  test("ci width grows as alpha decreases (wider for higher confidence)") {
    val rng = new Random(4)
    val d = draws(Seq.fill(300)((rng.nextDouble() < 0.4, rng.nextGaussian() * 2)): _*)
    val w95 = Bootstrap.ci(Seq(d), 800, 0.05, new Random(5)).width
    val w50 = Bootstrap.ci(Seq(d), 800, 0.5, new Random(5)).width
    assert(w95 > w50)
  }

  test("ci of an all-constant statistic is degenerate at that constant") {
    val d = draws(Seq.fill(50)((true, 3.0)): _*)
    val ci = Bootstrap.ci(Seq(d), 200, 0.05, new Random(6))
    assert(ci.lo == 3.0 && ci.hi == 3.0)
  }

  test("ci handles strata with zero positives") {
    val d1 = draws(Seq.fill(50)((false, 0.0)): _*)
    val d2 = draws(Seq.fill(50)((true, 5.0)): _*)
    val ci = Bootstrap.ci(Seq(d1, d2), 200, 0.05, new Random(7))
    assert(!ci.lo.isNaN && !ci.hi.isNaN)
    assert(ci.contains(5.0))
  }

  test("ci of empty draws everywhere is the zero point") {
    val ci = Bootstrap.ci(Seq(StratumDraws.empty), 100, 0.05, new Random(8))
    assert(ci.lo == 0.0 && ci.hi == 0.0)
  }

  test("ci is deterministic given the rng seed") {
    val rng = new Random(9)
    val d = draws(Seq.fill(200)((rng.nextDouble() < 0.3, rng.nextGaussian())): _*)
    val a = Bootstrap.ci(Seq(d), 300, 0.05, new Random(10))
    val b = Bootstrap.ci(Seq(d), 300, 0.05, new Random(10))
    assert(a == b)
  }

  test("ci validates parameters") {
    val d = draws((true, 1.0))
    intercept[IllegalArgumentException] { Bootstrap.ci(Seq(d), 1, 0.05, new Random(0)) }
    intercept[IllegalArgumentException] { Bootstrap.ci(Seq(d), 100, 0.0, new Random(0)) }
    intercept[IllegalArgumentException] { Bootstrap.ci(Seq(d), 100, 1.0, new Random(0)) }
  }

  // ----------------------------------------------------- end-to-end coverage

  test("nominal coverage: ~95% CIs contain the truth on repeated ABAE runs") {
    val rng = new Random(20)
    val n = 50000
    val proxy = Array.fill(n)(rng.nextDouble())
    val positive = proxy.map(p => rng.nextDouble() < p)
    val stat = proxy.map(p => 4.0 + 4.0 * p + rng.nextGaussian())
    val strat = StratifiedLocal(LocalRecords(proxy, positive, stat), 5)
    val trials = 120
    var covered = 0
    for (s <- 1 to trials) {
      val res = Abae.run(strat, new CountingOracle(strat), 1200, AbaeParams(), s)
      val ci = Bootstrap.ci(res.draws, beta = 300, alpha = 0.05, Rng.stream(1000L + s, 1))
      if (ci.contains(strat.truth)) covered += 1
    }
    val coverage = covered.toDouble / trials
    // Binomial(120, .95) 3-sigma band ≈ ±0.06.
    assert(coverage > 0.86, s"coverage=$coverage")
  }
}

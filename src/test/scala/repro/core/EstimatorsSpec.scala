package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class EstimatorsSpec extends AnyFunSuite {

  private def draws(pairs: (Boolean, Double)*): StratumDraws =
    StratumDraws(pairs.map(_._1).toArray, pairs.map(_._2).toArray)

  // ------------------------------------------------------------- fromDraws

  test("fromDraws on empty draws is all zero") {
    val e = Estimators.fromDraws(StratumDraws.empty)
    assert(e.draws == 0 && e.positives == 0)
    assert(e.pHat == 0.0 && e.muHat == 0.0 && e.sigmaHat == 0.0)
  }

  test("fromDraws with no positives has pHat 0 and muHat 0 (paper convention)") {
    val e = Estimators.fromDraws(draws((false, 1.0), (false, 2.0)))
    assert(e.pHat == 0.0)
    assert(e.muHat == 0.0)
    assert(e.sigmaHat == 0.0)
  }

  test("fromDraws with a single positive has sigmaHat 0 (|X|<=1 convention)") {
    val e = Estimators.fromDraws(draws((true, 3.0), (false, 9.0)))
    assert(e.positives == 1)
    assert(e.pHat == 0.5)
    assert(e.muHat == 3.0)
    assert(e.sigmaHat == 0.0)
  }

  test("fromDraws ignores statistic values of negative draws") {
    val e1 = Estimators.fromDraws(draws((true, 2.0), (false, 100.0), (true, 4.0)))
    val e2 = Estimators.fromDraws(draws((true, 2.0), (false, -100.0), (true, 4.0)))
    assert(e1.muHat == e2.muHat && e1.sigmaHat == e2.sigmaHat)
  }

  test("fromDraws computes pHat = positives / draws") {
    val e = Estimators.fromDraws(draws((true, 1.0), (true, 2.0), (false, 0.0), (false, 0.0)))
    assert(e.pHat == 0.5)
  }

  test("fromDraws muHat is mean of positive statistics") {
    val e = Estimators.fromDraws(draws((true, 1.0), (true, 5.0), (false, 7.0)))
    assert(e.muHat == 3.0)
  }

  test("fromDraws sigmaHat uses the (n-1) sample variance") {
    val e = Estimators.fromDraws(draws((true, 1.0), (true, 3.0)))
    // var = ((1-2)^2 + (3-2)^2) / (2-1) = 2
    assert(math.abs(e.sigmaHat - math.sqrt(2.0)) < 1e-12)
  }

  test("fromDraws matches direct formulas on a random sample") {
    val rng = new Random(0)
    val pairs = Seq.fill(500)((rng.nextBoolean(), rng.nextGaussian() * 3 + 1))
    val e = Estimators.fromDraws(draws(pairs: _*))
    val pos = pairs.filter(_._1).map(_._2)
    val mu = pos.sum / pos.size
    val sig = math.sqrt(pos.map(x => (x - mu) * (x - mu)).sum / (pos.size - 1))
    assert(math.abs(e.muHat - mu) < 1e-9)
    assert(math.abs(e.sigmaHat - sig) < 1e-9)
    assert(e.pHat == pos.size.toDouble / pairs.size)
  }

  // --------------------------------------------------------------- combine

  test("combine weights strata by pHat") {
    val est = Seq(
      StratumEstimates(10, 5, 0.5, 10.0, 1.0),
      StratumEstimates(10, 1, 0.1, 40.0, 1.0))
    // (0.5*10 + 0.1*40) / 0.6 = 9/0.6 = 15
    assert(math.abs(Estimators.combine(est) - 15.0) < 1e-12)
  }

  test("combine of all-zero pHat returns 0") {
    val est = Seq(StratumEstimates(5, 0, 0.0, 0.0, 0.0))
    assert(Estimators.combine(est) == 0.0)
  }

  test("combine with a single stratum returns its mean") {
    val est = Seq(StratumEstimates(10, 4, 0.4, 7.5, 2.0))
    assert(Estimators.combine(est) == 7.5)
  }

  test("combine ignores zero-pHat strata regardless of their muHat") {
    val est = Seq(
      StratumEstimates(10, 5, 0.5, 10.0, 1.0),
      StratumEstimates(10, 0, 0.0, 999.0, 0.0))
    assert(Estimators.combine(est) == 10.0)
  }

  // ------------------------------------------------------------ allocation

  test("allocation is proportional to sqrt(p)*sigma") {
    val t = Estimators.allocation(Array(0.25, 1.0), Array(2.0, 1.0))
    // raw = (0.5*2, 1*1) = (1, 1) -> (0.5, 0.5)
    assert(math.abs(t(0) - 0.5) < 1e-12)
    assert(math.abs(t(1) - 0.5) < 1e-12)
  }

  test("allocation sums to 1") {
    val rng = new Random(1)
    for (_ <- 1 to 50) {
      val k = 1 + rng.nextInt(10)
      val p = Array.fill(k)(rng.nextDouble())
      val s = Array.fill(k)(rng.nextDouble() * 5)
      val t = Estimators.allocation(p, s)
      assert(math.abs(t.sum - 1.0) < 1e-9)
      assert(t.forall(_ >= 0))
    }
  }

  test("allocation falls back to sqrt(p) when all sigma are zero") {
    val t = Estimators.allocation(Array(0.25, 1.0), Array(0.0, 0.0))
    // sqrt(p) = (0.5, 1) -> (1/3, 2/3)
    assert(math.abs(t(0) - 1.0 / 3) < 1e-12)
    assert(math.abs(t(1) - 2.0 / 3) < 1e-12)
  }

  test("allocation falls back to uniform when pilot saw no positives") {
    val t = Estimators.allocation(Array(0.0, 0.0, 0.0), Array(0.0, 0.0, 0.0))
    assert(t.forall(x => math.abs(x - 1.0 / 3) < 1e-12))
  }

  test("allocation gives zero share to strata with pHat 0 when others have signal") {
    val t = Estimators.allocation(Array(0.0, 0.5), Array(0.0, 2.0))
    assert(t(0) == 0.0 && t(1) == 1.0)
  }

  test("allocation rejects mismatched lengths") {
    intercept[IllegalArgumentException] {
      Estimators.allocation(Array(0.1), Array(1.0, 2.0))
    }
  }

  // -------------------------------------------------------------- prop2Mse

  test("prop2Mse matches the closed form on a hand-computed example") {
    // p = (1, 0.25), sigma = (1, 2): sum sqrt(p)σ = 1 + 1 = 2; p_all = 1.25
    // MSE = 4 / (N * 1.5625)
    val mse = Estimators.prop2Mse(Array(1.0, 0.25), Array(1.0, 2.0), 100.0)
    assert(math.abs(mse - 4.0 / (100.0 * 1.5625)) < 1e-12)
  }

  test("prop2Mse decays as 1/N") {
    val p = Array(0.3, 0.6)
    val s = Array(1.0, 2.0)
    val m1 = Estimators.prop2Mse(p, s, 100.0)
    val m2 = Estimators.prop2Mse(p, s, 200.0)
    assert(math.abs(m1 / m2 - 2.0) < 1e-9)
  }

  test("prop2Mse is infinite when no stratum has positives") {
    assert(Estimators.prop2Mse(Array(0.0, 0.0), Array(1.0, 1.0), 100.0).isInfinite)
  }

  test("allocationMse at T* equals prop2Mse (Eq. 3 = Eq. 4)") {
    val rng = new Random(2)
    for (_ <- 1 to 25) {
      val k = 2 + rng.nextInt(6)
      val p = Array.fill(k)(0.05 + rng.nextDouble() * 0.9)
      val s = Array.fill(k)(0.1 + rng.nextDouble() * 3)
      val tStar = Estimators.allocation(p, s)
      val lhs = Estimators.allocationMse(p, s, tStar, 1000.0)
      val rhs = Estimators.prop2Mse(p, s, 1000.0)
      assert(math.abs(lhs - rhs) < 1e-9 * math.max(lhs, rhs),
        s"p=${p.toSeq} s=${s.toSeq}")
    }
  }

  test("allocationMse is infinite when a positive-mass stratum gets zero allocation") {
    val mse = Estimators.allocationMse(Array(0.5, 0.5), Array(1.0, 1.0), Array(1.0, 0.0), 100.0)
    assert(mse.isInfinite)
  }

  // ----------------------------------------------------------- StratumDraws

  test("StratumDraws concatenation preserves order and length") {
    val a = draws((true, 1.0), (false, 2.0))
    val b = draws((true, 3.0))
    val c = a ++ b
    assert(c.n == 3)
    assert(c.flags.toSeq == Seq(true, false, true))
    assert(c.stats.toSeq == Seq(1.0, 2.0, 3.0))
  }

  test("positiveStats extracts positives in draw order") {
    val d = draws((true, 5.0), (false, 6.0), (true, 7.0))
    assert(d.positiveStats.toSeq == Seq(5.0, 7.0))
  }

  test("StratumDraws rejects misaligned arrays") {
    intercept[IllegalArgumentException] {
      StratumDraws(Array(true), Array.emptyDoubleArray)
    }
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.metrics.Metrics
import repro.sampling.{PermutationSampler, Rng}
import scala.util.Random

class ProxyCombinerSpec extends AnyFunSuite {

  private val n = 50000
  private val rng = new Random(0)
  private val theta = Array.fill(n)(rng.nextDouble() * 0.6)
  private val positive = theta.map(t => rng.nextDouble() < t)
  private val stat = theta.map(t => 4.0 + 8.0 * t + rng.nextGaussian())
  private def noisy(tau: Double, seed: Int): Array[Double] = {
    val r = new Random(seed)
    theta.map(t => math.min(1.0, math.max(0.0, t + r.nextGaussian() * tau)))
  }
  private val good = noisy(0.05, 1)
  private val junk = Array.fill(n)(new Random(2).nextDouble())
  private val truth = {
    val pos = stat.zip(positive).filter(_._2).map(_._1)
    pos.sum / pos.length
  }

  test("combineScores separates positives from negatives") {
    val pilot = new PermutationSampler(n, Rng.stream(5, 0)).next(2000)
    val (scores, _) = ProxyCombiner.combineScores(
      Vector(good, junk), pilot, pilot.map(positive))
    val posMean = scores.zip(positive).filter(_._2).map(_._1).sum / positive.count(identity)
    val negMean = scores.zip(positive).filterNot(_._2).map(_._1).sum / positive.count(!_)
    assert(posMean > negMean + 0.1, s"pos=$posMean neg=$negMean")
  }

  test("combineScores effectively ignores the junk proxy") {
    val pilot = new PermutationSampler(n, Rng.stream(6, 0)).next(3000)
    val (_, model) = ProxyCombiner.combineScores(
      Vector(good, junk), pilot, pilot.map(positive))
    assert(math.abs(model.weights(0)) > 3 * math.abs(model.weights(1)),
      s"weights=${model.weights.toSeq}")
  }

  test("run estimates near truth and respects the budget") {
    val res = ProxyCombiner.run(positive, stat, Vector(good, junk), budget = 3000,
      AbaeParams(k = 5), seed = 1)
    assert(res.oracleCalls <= 3000)
    assert(math.abs(res.estimate - truth) < 0.3, s"est=${res.estimate} truth=$truth")
  }

  test("run is deterministic in the seed") {
    def once(seed: Long) = ProxyCombiner.run(positive, stat, Vector(good, junk),
      2000, AbaeParams(), seed).estimate
    assert(once(3) == once(3))
    assert(once(3) != once(4))
  }

  test("combined proxy matches or beats the junk-only proxy in RMSE") {
    import repro.data.{CountingOracle, LocalRecords, StratifiedLocal}
    val trials = 60
    val budget = 2000
    val combined = Metrics.rmse((1 to trials).map(s =>
      ProxyCombiner.run(positive, stat, Vector(good, junk), budget,
        AbaeParams(), s).estimate), truth)
    val junkStrat = StratifiedLocal(LocalRecords(junk, positive, stat), 5)
    val junkRmse = Metrics.rmse((1 to trials).map(s =>
      Abae.run(junkStrat, new CountingOracle(junkStrat), budget,
        AbaeParams(), s).estimate), junkStrat.truth)
    assert(combined < junkRmse, s"combined=$combined junk=$junkRmse")
  }

  test("run rejects undersized budgets") {
    intercept[IllegalArgumentException] {
      ProxyCombiner.run(positive, stat, Vector(good), 5, AbaeParams(k = 5), 1)
    }
  }
}

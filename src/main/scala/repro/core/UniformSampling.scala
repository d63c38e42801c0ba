package repro.core

import repro.data.{FlatOracle, LocalRecords}
import repro.sampling.{PermutationSampler, Rng}
import scala.util.Random

/** Uniform-sampling baseline — the only standard AQP method applicable
  * when predicate results are unavailable at ingest (§5.1, "Methods
  * evaluated"). Draws N records uniformly without replacement, queries
  * the oracle on each, and averages the statistic over the positives.
  */
object UniformSampling {

  final case class Result(estimate: Double, draws: StratumDraws, oracleCalls: Long)

  def run(records: LocalRecords, budget: Int, seed: Long): Result = {
    val oracle = new FlatOracle(records)
    run(records.n, oracle.query, budget, Rng.stream(seed, Long.MaxValue / 3))
  }

  def run(n: Int, oracle: Int => (Boolean, Double), budget: Int, rng: Random): Result = {
    val sampler = new PermutationSampler(n, rng)
    val idx = sampler.next(budget)
    val flags = new Array[Boolean](idx.length)
    val stats = new Array[Double](idx.length)
    var i = 0
    while (i < idx.length) {
      val (pos, st) = oracle(idx(i))
      flags(i) = pos
      stats(i) = st
      i += 1
    }
    val d = StratumDraws(flags, stats)
    val est = Estimators.fromDraws(d)
    Result(est.muHat, d, idx.length.toLong)
  }

  /** 95%-style bootstrap CI for the uniform estimator: the draw set is a
    * single "stratum", resampled exactly as in Algorithm 2.
    */
  def ci(result: Result, beta: Int, alpha: Double, rng: Random): Bootstrap.Interval =
    Bootstrap.ci(Seq(result.draws), beta, alpha, rng)
}

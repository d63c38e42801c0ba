package repro.core

import repro.data.StratifiedLocal
import repro.ml.LogisticRegression
import repro.sampling.{PermutationSampler, PoolSampling, Rng}

/** Proxy combination (§3.4): "ABAE can combine proxies by sampling
  * randomly in Stage 1 and using these samples to train a logistic
  * regression model using the proxies as features and the predicate as
  * the target."
  *
  * Because the combined proxy only exists *after* Stage 1, this variant
  * of ABAE draws its Stage-1 sample uniformly over the whole dataset,
  * trains the model, scores every record (proxies are cheap, so scoring
  * is free in oracle units), stratifies on the learned score, maps the
  * Stage-1 sample into the new strata as the pilot, and runs Stage 2
  * with the usual √p̂·σ̂ allocation. Stage-2 draws exclude Stage-1
  * records per stratum, so each stratum's union is a uniform
  * without-replacement sample.
  */
object ProxyCombiner {

  final case class CombinedResult(
      estimate: Double,
      oracleCalls: Long,
      model: LogisticRegression#Model,
  )

  /** Train on a labeled pilot and score every record. */
  def combineScores(
      proxies: Vector[Array[Double]],
      pilotIdx: Array[Int],
      pilotLabels: Array[Boolean],
  ): (Array[Double], LogisticRegression#Model) = {
    val lr = new LogisticRegression()
    val xs = pilotIdx.map(i => proxies.map(_(i)).toArray)
    val ys = pilotLabels.map(b => if (b) 1 else 0)
    val model = lr.fit(xs, ys)
    val n = proxies.head.length
    val scores = new Array[Double](n)
    val feat = new Array[Double](proxies.length)
    var i = 0
    while (i < n) {
      var j = 0
      while (j < proxies.length) { feat(j) = proxies(j)(i); j += 1 }
      scores(i) = model.predictProb(feat)
      i += 1
    }
    (scores, model)
  }

  /** Run combined-proxy ABAE end to end.
    *
    * @param positive hidden oracle labels (accessed only for sampled records)
    * @param stat     hidden statistic values
    * @param proxies  cheap per-record candidate scores (freely readable)
    */
  def run(
      positive: Array[Boolean],
      stat: Array[Double],
      proxies: Vector[Array[Double]],
      budget: Int,
      params: AbaeParams,
      seed: Long,
  ): CombinedResult = {
    val n = positive.length
    val k = params.k
    require(budget >= 2 * k, s"budget $budget too small for $k strata")
    val rng = Rng.stream(seed, 13)
    var calls = 0L
    def oracle(i: Int): (Boolean, Double) = { calls += 1; (positive(i), stat(i)) }

    // Stage 1: uniform pilot, labels both train the combiner and seed the
    // per-stratum estimates.
    val n1 = math.max(k * 2, (budget * params.stage1Frac).toInt)
    val pilotIdx = new PermutationSampler(n, rng).next(n1)
    val pilotRes = pilotIdx.map(oracle)
    val pilotPos = pilotRes.map(_._1)
    val pilotStat = pilotRes.map(_._2)

    val (scores, model) = combineScores(proxies, pilotIdx, pilotPos)

    // Restratify on the learned score; map the pilot into the new strata.
    val strataIdx = StratifiedLocal.ntileIndices(scores, k)
    val stratumOf = new Array[Int](n)
    for (s <- 0 until k; i <- strataIdx(s)) stratumOf(i) = s
    val drawn = new Array[Boolean](n)
    pilotIdx.foreach(drawn(_) = true)
    val cellFlags = Array.fill(k)(Array.newBuilder[Boolean])
    val cellStats = Array.fill(k)(Array.newBuilder[Double])
    pilotIdx.indices.foreach { j =>
      val s = stratumOf(pilotIdx(j))
      cellFlags(s) += pilotPos(j)
      cellStats(s) += pilotStat(j)
    }
    val pilotDraws = Array.tabulate(k)(s => StratumDraws(cellFlags(s).result(), cellStats(s).result()))
    val pilotEst = pilotDraws.map(Estimators.fromDraws)

    val n2 = budget - n1
    val tHat = Estimators.allocationFromPilot(pilotEst.toIndexedSeq)

    // Stage 2: ⌊N2·T̂_k⌋ uniform draws from each stratum's remaining pool.
    val finalEst = Vector.tabulate(k) { s =>
      val m = (n2 * tHat(s)).toInt
      val extraIdx = PoolSampling.sample(strataIdx(s), drawn, m, rng)
      val extra = extraIdx.map(oracle)
      Estimators.fromDraws(pilotDraws(s) ++ StratumDraws(extra.map(_._1), extra.map(_._2)))
    }
    CombinedResult(Estimators.combine(finalEst), calls, model)
  }
}

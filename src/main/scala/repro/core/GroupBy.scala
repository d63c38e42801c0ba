package repro.core

import repro.data.GroupedRecords
import repro.optim.NelderMead
import repro.sampling.{PermutationSampler, PoolSampling, Rng}
import scala.collection.mutable.ArrayBuffer

/** Oracle that maps a record directly to its group key (§3.2, scenario 1:
  * "a single oracle determines the group key directly"). Labels are
  * cached, so a record sampled through several stratifications is charged
  * exactly once.
  */
final class SingleGroupOracle(data: GroupedRecords) {
  private val labeled = new java.util.BitSet(data.n)
  private var invocations: Long = 0L
  def calls: Long = invocations

  /** Returns (group key in 0..G-1 or -1, statistic). */
  def query(i: Int): (Int, Double) = {
    if (!labeled.get(i)) { invocations += 1; labeled.set(i) }
    (data.group(i), data.stat(i))
  }
}

/** One oracle per group (§3.2, scenario 2): `query(g, i)` only reveals
  * whether record `i` belongs to group `g`. Each invocation costs 1.
  */
final class PerGroupOracle(data: GroupedRecords) {
  private var invocations: Long = 0L
  def calls: Long = invocations

  def query(g: Int, i: Int): (Boolean, Double) = {
    invocations += 1
    (data.group(i) == g, data.stat(i))
  }
}

/** ABAE-GroupBy (§3.2, §4.5): minimax-error sample allocation across the
  * per-group stratifications, solved with Nelder–Mead over the
  * probability simplex (Eqs. 10 and 11).
  */
object GroupBy {

  final case class GroupByParams(k: Int = 5, stage1Frac: Double = 0.5)

  /** @param estimates   μ̂_g per group
    * @param lambdas     Stage-2 share Λ_l per stratification
    * @param oracleCalls total oracle invocations charged
    */
  final case class GroupByResult(
      estimates: Vector[Double],
      lambdas: Array[Double],
      oracleCalls: Long,
  )

  private val VarFloor = 1e-12

  /** Λ-free part of the estimated MSE of group g's estimator from
    * stratification l (the inner sum of Eqs. 10–11):
    * `Σ_k ŵ² σ̂² / (p̂ T̂)`; the modeled error is this over `Λ_l·N2`.
    * Infinite when some stratum has mass (p̂ > 0) but no allocation.
    */
  def baseVariance(cells: IndexedSeq[StratumEstimates], tHat: Array[Double]): Double = {
    val pSum = cells.map(_.pHat).sum
    if (pSum == 0.0) return Double.PositiveInfinity // no information about this group
    var s = 0.0
    var k = 0
    while (k < cells.length) {
      val e = cells(k)
      val w = e.pHat / pSum
      if (w > 0) {
        if (tHat(k) <= 0) return Double.PositiveInfinity
        s += w * w * e.sigmaHat * e.sigmaHat / (e.pHat * tHat(k))
      }
      k += 1
    }
    math.max(s, VarFloor)
  }

  /** Realized variance estimate of a per-stratification group estimator,
    * `Σ_k ŵ² σ̂² / B_k` over positive draw counts. Provided as the
    * diagnostic behind the pooling analysis in DESIGN.md §3b (the paper's
    * inverse-variance pooling would weight by 1/this); the shipped
    * single-oracle estimator does not pool — see [[runSingleOracle]].
    */
  def realizedVariance(cells: IndexedSeq[StratumEstimates]): Double = {
    val pSum = cells.map(_.pHat).sum
    if (pSum == 0.0) return Double.PositiveInfinity
    var s = 0.0
    var k = 0
    while (k < cells.length) {
      val e = cells(k)
      val w = e.pHat / pSum
      if (w > 0) s += w * w * e.sigmaHat * e.sigmaHat / e.positives
      k += 1
    }
    math.max(s, VarFloor)
  }

  private def drawsOf(records: GroupedRecords, idx: ArrayBuffer[Int], g: Int): StratumDraws = {
    val flags = new Array[Boolean](idx.length)
    val stats = new Array[Double](idx.length)
    var i = 0
    while (i < idx.length) {
      flags(i) = records.group(idx(i)) == g
      stats(i) = records.stat(idx(i))
      i += 1
    }
    StratumDraws(flags, stats)
  }

  // ------------------------------------------------------------ single oracle

  /** Single-oracle ABAE-GroupBy. Stage 1 samples uniformly (every label
    * reveals the full group key, so it pilots all G stratifications at
    * once); Stage 2 splits Λ·N2 across stratifications by minimizing the
    * Eq. 10 minimax objective with inverse-variance pooling, then
    * allocates within each stratification by T̂.
    */
  def runSingleOracle(
      data: GroupedRecords,
      budget: Int,
      params: GroupByParams,
      seed: Long,
  ): GroupByResult = {
    val g = data.g
    val k = params.k
    val n = data.n
    require(budget >= 2 * g * k, s"budget $budget too small for $g groups × $k strata")

    val strataIdx = data.proxies.map(p => repro.data.StratifiedLocal.ntileIndices(p, k))
    val stratumOf = strataIdx.map { idx =>
      val m = new Array[Int](n)
      for (s <- 0 until k; i <- idx(s)) m(i) = s
      m
    }
    val oracle = new SingleGroupOracle(data)
    val rng = Rng.stream(seed, 0)

    // Stage 1: one global uniform sample, visible to every stratification.
    val n1 = math.max(g * k, (budget * params.stage1Frac).toInt)
    val stage1 = new PermutationSampler(n, rng).next(n1)
    stage1.foreach(oracle.query)

    val cellDraws = Vector.fill(g, k)(ArrayBuffer.empty[Int])
    val drawnIn = Vector.fill(g)(new Array[Boolean](n))
    for (i <- stage1; l <- 0 until g) {
      cellDraws(l)(stratumOf(l)(i)) += i
      drawnIn(l)(i) = true
    }

    def cellEst(l: Int, targetG: Int): Vector[StratumEstimates] =
      Vector.tabulate(k)(s => Estimators.fromDraws(drawsOf(data, cellDraws(l)(s), targetG)))

    // Within-stratification allocation: optimal for the stratification's
    // own group (T̂_{l,k} from p̂_{l,l,k}, σ̂_{l,l,k}, pooled-σ̂ repaired).
    val ownEst = Vector.tabulate(g)(l => cellEst(l, l))
    val tHat = ownEst.map(e => Estimators.allocationFromPilot(e))

    val n2 = (budget - oracle.calls).toInt
    val n1PerCell = n1.toDouble / k
    // Minimax objective (the Eq. 10 allocation question, adapted to the
    // every-draw-in-every-stratification estimator below): group g's
    // modeled error is the ratio-estimator variance over its own
    // stratification's cells, Σ_k ŵ² σ̂² / (p̂ · d_k(Λ)), where cell k's
    // draw count d_k(Λ) = Stage-1 share + Λ_g·N2·T̂_{g,k} (own,
    // concentrated) + Σ_{l≠g} Λ_l·N2 / K (cross draws, which land flat).
    def objective(lambda: Array[Double]): Double = {
      var worst = 0.0
      var tg = 0
      while (tg < g) {
        val cells = ownEst(tg)
        val pSum = cells.map(_.pHat).sum
        val crossFlat = (1.0 - lambda(tg)) * n2 / k
        var v = 0.0
        var s = 0
        while (s < k) {
          val e = cells(s)
          if (e.pHat > 0) {
            val w = e.pHat / pSum
            val d = n1PerCell + lambda(tg) * n2 * tHat(tg)(s) + crossFlat
            v += w * w * math.max(e.sigmaHat * e.sigmaHat, VarFloor) / (e.pHat * d)
          }
          s += 1
        }
        val err = if (pSum == 0) Double.MaxValue else v
        if (err > worst) worst = err
        tg += 1
      }
      worst
    }
    val lambdas = NelderMead.minimizeOnSimplex(objective, g).point

    // Stage 2: Λ_l·N2 to stratification l, T̂_{l,k} within it; draws are
    // uniform over each cell's not-yet-drawn records so stage unions stay
    // uniform without replacement. Because the single oracle labels the
    // *group key* of every sampled record, each draw is usable by every
    // stratification ("estimates for the other groups for free"): it is
    // filed into its cell of all G stratifications, which stays valid
    // because a draw targeted by stratification l lands uniformly within
    // any cell of an independent stratification l'.
    for (l <- 0 until g) {
      val budgetL = (lambdas(l) * n2).toInt
      for (s <- 0 until k) {
        val m = (budgetL * tHat(l)(s)).toInt
        val drawn = PoolSampling.sample(strataIdx(l)(s), i => drawnIn(l)(i), m, rng)
        drawn.foreach { i =>
          oracle.query(i)
          for (l2 <- 0 until g) {
            cellDraws(l2)(stratumOf(l2)(i)) += i
            drawnIn(l2)(i) = true
          }
        }
      }
    }

    // Final: group g is estimated from its own stratification, whose
    // cells now hold EVERY labeled draw (cross-filed above). This
    // realizes the paper's "estimates for the other groups for free"
    // reuse; we deviate from its inverse-variance pooling across
    // stratifications because with a shared sample the pooled components
    // are strongly correlated and pooling can only add the convexity
    // penalty of the misaligned stratifications (see DESIGN.md §2).
    val estimates = Vector.tabulate(g)(tg => Estimators.combine(cellEst(tg, tg)))
    GroupByResult(estimates, lambdas, oracle.calls)
  }

  // ------------------------------------------------------------ multi oracle

  /** Multi-oracle ABAE-GroupBy: G independent single-predicate ABAEs,
    * with Stage-2 budget split across groups by the Eq. 11 minimax
    * objective. Oracle g is only applied to samples from stratification g.
    */
  def runMultiOracle(
      data: GroupedRecords,
      budget: Int,
      params: GroupByParams,
      seed: Long,
  ): GroupByResult = {
    val g = data.g
    val k = params.k
    require(budget >= 2 * g * k, s"budget $budget too small for $g groups × $k strata")

    val strataIdx = data.proxies.map(p => repro.data.StratifiedLocal.ntileIndices(p, k))
    val oracle = new PerGroupOracle(data)
    val samplers = Vector.tabulate(g, k)((l, s) =>
      new PermutationSampler(strataIdx(l)(s).length, Rng.stream(seed, l.toLong * k + s + 1)))

    def draw(l: Int, s: Int, m: Int): StratumDraws = {
      val local = samplers(l)(s).next(m)
      val flags = new Array[Boolean](local.length)
      val stats = new Array[Double](local.length)
      var i = 0
      while (i < local.length) {
        val (pos, st) = oracle.query(l, strataIdx(l)(s)(local(i)))
        flags(i) = pos
        stats(i) = st
        i += 1
      }
      StratumDraws(flags, stats)
    }

    // Stage 1: N1/(G·K) per cell, each group charged to its own oracle.
    val n1cell = math.max(1, (budget * params.stage1Frac).toInt / (g * k))
    val stage1 = Vector.tabulate(g, k)((l, s) => draw(l, s, n1cell))
    val est1 = stage1.map(_.map(Estimators.fromDraws))
    val tHat = est1.map(e => Estimators.allocationFromPilot(e))
    val base = Array.tabulate(g)(l => baseVariance(est1(l), tHat(l)))

    val n2 = (budget - oracle.calls).toInt
    // Eq. 11 objective: max_g baseVar(g) / (Λ_g · N2).
    def objective(lambda: Array[Double]): Double = {
      var worst = 0.0
      var l = 0
      while (l < g) {
        val v =
          if (base(l).isInfinite) Double.MaxValue
          else if (lambda(l) <= 0) Double.MaxValue
          else base(l) / (lambda(l) * n2)
        if (v > worst) worst = v
        l += 1
      }
      worst
    }
    val lambdas = NelderMead.minimizeOnSimplex(objective, g).point

    // Stage 2 extends each cell's permutation — exact sample reuse.
    val estimates = Vector.tabulate(g) { l =>
      val budgetL = (lambdas(l) * n2).toInt
      val cells = Vector.tabulate(k) { s =>
        val extra = draw(l, s, (budgetL * tHat(l)(s)).toInt)
        Estimators.fromDraws(stage1(l)(s) ++ extra)
      }
      Estimators.combine(cells)
    }
    GroupByResult(estimates, lambdas, oracle.calls)
  }

  // ------------------------------------------------------- uniform baselines

  /** Uniform baseline, single oracle: one uniform sample; each label
    * reveals the group key; per-group mean over members.
    */
  def uniformSingleOracle(data: GroupedRecords, budget: Int, seed: Long): GroupByResult = {
    val oracle = new SingleGroupOracle(data)
    val idx = new PermutationSampler(data.n, Rng.stream(seed, 7)).next(budget)
    val sums = new Array[Double](data.g)
    val counts = new Array[Int](data.g)
    idx.foreach { i =>
      val (gi, st) = oracle.query(i)
      if (gi >= 0) { sums(gi) += st; counts(gi) += 1 }
    }
    GroupByResult(
      Vector.tabulate(data.g)(j => if (counts(j) == 0) 0.0 else sums(j) / counts(j)),
      Array.fill(data.g)(1.0 / data.g),
      oracle.calls)
  }

  /** Uniform baseline, multiple oracles: budget split equally; group g's
    * share is a uniform sample labeled only by oracle g.
    */
  def uniformMultiOracle(data: GroupedRecords, budget: Int, seed: Long): GroupByResult = {
    val oracle = new PerGroupOracle(data)
    val per = budget / data.g
    val estimates = Vector.tabulate(data.g) { l =>
      val idx = new PermutationSampler(data.n, Rng.stream(seed, 100 + l)).next(per)
      var sum = 0.0
      var cnt = 0
      idx.foreach { i =>
        val (pos, st) = oracle.query(l, i)
        if (pos) { sum += st; cnt += 1 }
      }
      if (cnt == 0) 0.0 else sum / cnt
    }
    GroupByResult(estimates, Array.fill(data.g)(1.0 / data.g), oracle.calls)
  }
}

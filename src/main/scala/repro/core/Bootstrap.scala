package repro.core

import scala.util.Random

/** Algorithm 2 — non-parametric bootstrap over both stages' samples.
  *
  * Per trial, each stratum's draw set `R_k^(2)` is resampled with
  * replacement at its own size, the plug-in estimates are recomputed,
  * and the combined μ̂* recorded; the CI is the (α/2, 1−α/2) percentile
  * interval over β trials.
  *
  * Implementation note: resampling records with replacement only needs
  * one uniform index per draw — we order each stratum's draws positives
  * first (a relabeling, which leaves the resampling distribution of the
  * record *multiset* unchanged), so index < |X_k| means "drew positive
  * record index". This keeps the β·N inner loop allocation-free.
  */
object Bootstrap {

  /** Two-sided percentile interval. */
  final case class Interval(lo: Double, hi: Double) {
    def width: Double = hi - lo
    def contains(x: Double): Boolean = x >= lo && x <= hi
  }

  /** Compute the CI from all draws (both stages) per stratum.
    *
    * @param beta  number of bootstrap trials (paper uses 1,000)
    * @param alpha failure probability (0.05 for a 95% CI)
    */
  def ci(draws: Seq[StratumDraws], beta: Int, alpha: Double, rng: Random): Interval = {
    require(beta >= 2, "need at least two bootstrap trials")
    require(alpha > 0 && alpha < 1, "alpha must be in (0,1)")
    val k = draws.length
    val ns = draws.map(_.n).toArray
    val posVals = draws.map(_.positiveStats).toArray

    val estimates = new Array[Double](beta)
    var b = 0
    while (b < beta) {
      var pAll = 0.0
      var weighted = 0.0
      var s = 0
      while (s < k) {
        val n = ns(s)
        if (n > 0) {
          val pv = posVals(s)
          var cnt = 0
          var sum = 0.0
          var i = 0
          while (i < n) {
            val idx = rng.nextInt(n)
            if (idx < pv.length) { cnt += 1; sum += pv(idx) }
            i += 1
          }
          val pStar = cnt.toDouble / n
          val muStar = if (cnt > 0) sum / cnt else 0.0
          pAll += pStar
          weighted += pStar * muStar
        }
        s += 1
      }
      estimates(b) = if (pAll == 0.0) 0.0 else weighted / pAll
      b += 1
    }

    java.util.Arrays.sort(estimates)
    Interval(percentile(estimates, alpha / 2), percentile(estimates, 1 - alpha / 2))
  }

  /** Linear-interpolation percentile over a sorted array. */
  def percentile(sorted: Array[Double], q: Double): Double = {
    val pos = q * (sorted.length - 1)
    val lo = pos.toInt
    val hi = math.min(lo + 1, sorted.length - 1)
    val frac = pos - lo
    sorted(lo) * (1 - frac) + sorted(hi) * frac
  }
}

package repro.sampling

import scala.util.Random

/** Without-replacement sampling from an explicit index pool, optionally
  * excluding already-drawn records.
  *
  * Used where a uniform Stage-1 sample was drawn *outside* a
  * stratification (ABAE-GroupBy single-oracle, proxy combination): the
  * Stage-2 sample must be uniform over the stratum's *remaining* records
  * so that the union of both stages is still a uniform
  * without-replacement sample of the stratum.
  */
object PoolSampling {

  /** Draw `m` distinct indices uniformly from `pool` minus the excluded
    * ones (capped at the eligible count), via partial Fisher–Yates on the
    * filtered copy.
    */
  def sample(pool: Array[Int], exclude: Int => Boolean, m: Int, rng: Random): Array[Int] = {
    val eligible = pool.filterNot(exclude)
    val take = math.min(m, eligible.length)
    var i = 0
    while (i < take) {
      val j = i + rng.nextInt(eligible.length - i)
      val t = eligible(i); eligible(i) = eligible(j); eligible(j) = t
      i += 1
    }
    java.util.Arrays.copyOfRange(eligible, 0, take)
  }
}

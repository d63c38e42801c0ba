package repro.data

import org.apache.spark.sql.DataFrame

/** Driver-side view of a dataset: per-record proxy score, hidden
  * predicate label, and hidden statistic value.
  *
  * The paper's evaluation (like the authors' released code) runs its
  * Monte-Carlo trial loops over precomputed (proxy, oracle, statistic)
  * triples — the modeled cost is *oracle invocations*, not dataflow.
  * Spark generates and stratifies the data; the trial loops run here.
  * Algorithms must not read `positive`/`stat` directly — they go through
  * a [[CountingOracle]] so every label observation is charged.
  */
final case class LocalRecords(
    proxy: Array[Double],
    positive: Array[Boolean],
    stat: Array[Double],
) {
  require(proxy.length == positive.length && proxy.length == stat.length,
    "column length mismatch")

  def n: Int = proxy.length

  /** Ground truth μ = AVG(stat) over records satisfying the predicate. */
  lazy val truth: Double = {
    var s = 0.0; var c = 0
    var i = 0
    while (i < n) { if (positive(i)) { s += stat(i); c += 1 }; i += 1 }
    if (c == 0) 0.0 else s / c
  }

  /** Overall predicate positive rate. */
  lazy val positiveRate: Double = {
    var c = 0; var i = 0
    while (i < n) { if (positive(i)) c += 1; i += 1 }
    c.toDouble / n
  }
}

object LocalRecords {
  /** Collect the canonical `(proxy, positive, stat)` columns of a
    * generated DataFrame. Row order is made deterministic by sorting on
    * `id` so a (dataset, seed) pair always yields the same arrays.
    */
  def fromDf(df: DataFrame): LocalRecords = {
    val rows = df.select("id", "proxy", "positive", "stat").orderBy("id").collect()
    val proxy = new Array[Double](rows.length)
    val pos = new Array[Boolean](rows.length)
    val stat = new Array[Double](rows.length)
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      proxy(i) = r.getDouble(1)
      pos(i) = r.getBoolean(2)
      stat(i) = r.getDouble(3)
      i += 1
    }
    LocalRecords(proxy, pos, stat)
  }
}

/** One stratum's population with hidden labels. */
final case class StratumRecords(positive: Array[Boolean], stat: Array[Double]) {
  def n: Int = positive.length

  /** Population p_k — for ground truth / theory tests only. */
  lazy val truthP: Double = {
    var c = 0; var i = 0
    while (i < n) { if (positive(i)) c += 1; i += 1 }
    if (n == 0) 0.0 else c.toDouble / n
  }

  /** Population μ_k over positives — for ground truth / theory tests only. */
  lazy val truthMu: Double = {
    var s = 0.0; var c = 0; var i = 0
    while (i < n) { if (positive(i)) { s += stat(i); c += 1 }; i += 1 }
    if (c == 0) 0.0 else s / c
  }

  /** Population σ_k over positives — for ground truth / theory tests only. */
  lazy val truthSigma: Double = {
    var s = 0.0; var s2 = 0.0; var c = 0; var i = 0
    while (i < n) { if (positive(i)) { s += stat(i); s2 += stat(i) * stat(i); c += 1 }; i += 1 }
    if (c == 0) 0.0 else math.sqrt(math.max(0.0, s2 / c - (s / c) * (s / c)))
  }
}

/** Proxy-quantile stratification of a [[LocalRecords]] into K strata,
  * mirroring Spark's `ntile(K) OVER (ORDER BY proxy, id)` exactly
  * (tested against it): records sorted by (proxy, index), the first
  * `n mod K` strata get `⌈n/K⌉` records, the rest `⌊n/K⌋`.
  */
final case class StratifiedLocal(strata: Vector[StratumRecords]) {
  def k: Int = strata.length
  def sizes: Vector[Int] = strata.map(_.n)

  /** Ground truth μ_all = Σ p_k μ_k / Σ p_k (equals the global positive
    * mean up to stratum-size rounding, which ntile keeps within 1).
    */
  lazy val truth: Double = {
    val pAll = strata.map(_.truthP).sum
    if (pAll == 0) 0.0 else strata.map(s => s.truthP * s.truthMu).sum / pAll
  }
}

object StratifiedLocal {
  /** ntile bucket sizes: first (n mod k) buckets get one extra record. */
  def ntileSizes(n: Int, k: Int): Array[Int] = {
    val base = n / k
    val rem = n % k
    Array.tabulate(k)(i => if (i < rem) base + 1 else base)
  }

  /** Record indices per stratum under ntile-by-(proxy, index) order. */
  def ntileIndices(proxy: Array[Double], k: Int): Array[Array[Int]] = {
    val order = Array.range(0, proxy.length)
      .sortBy(i => (proxy(i), i))
    val sizes = ntileSizes(proxy.length, k)
    val out = new Array[Array[Int]](k)
    var offset = 0
    var s = 0
    while (s < k) {
      out(s) = java.util.Arrays.copyOfRange(order, offset, offset + sizes(s))
      offset += sizes(s)
      s += 1
    }
    out
  }

  def apply(records: LocalRecords, k: Int): StratifiedLocal = {
    val idx = ntileIndices(records.proxy, k)
    StratifiedLocal(idx.toVector.map { ids =>
      StratumRecords(ids.map(records.positive), ids.map(records.stat))
    })
  }
}

/** Flat (unstratified) counting oracle over the whole record array —
  * what the uniform-sampling baseline queries.
  */
final class FlatOracle(records: LocalRecords) {
  private var invocations: Long = 0L
  def calls: Long = invocations
  def query(i: Int): (Boolean, Double) = {
    invocations += 1
    (records.positive(i), records.stat(i))
  }
}

/** Oracle access with an invocation counter — the unit of cost in every
  * experiment is `calls`. Benches assert `calls <= budget`.
  */
final class CountingOracle(data: StratifiedLocal) {
  private var invocations: Long = 0L
  def calls: Long = invocations

  /** Evaluate the expensive predicate (and reveal the statistic) for
    * record `i` of stratum `k`.
    */
  def query(k: Int, i: Int): (Boolean, Double) = {
    invocations += 1
    val s = data.strata(k)
    (s.positive(i), s.stat(i))
  }
}

package repro.ml

/** Minimal batch-gradient-descent logistic regression.
  *
  * Substrate for ABAE's proxy-combination procedure (§3.4): "ABAE can
  * combine proxies by sampling randomly in Stage 1 and using these
  * samples to train a logistic regression model using the proxies as
  * features and the predicate as the target." Pilot samples number in
  * the low thousands with a handful of proxy features, so a dense
  * driver-side implementation is the right tool — no distributed solver
  * is needed (the expensive resource being modeled is oracle calls, not
  * FLOPs).
  *
  * Uses full-batch gradient descent on the L2-regularized negative
  * log-likelihood with a fixed step size; features are standardized
  * internally for conditioning.
  */
final class LogisticRegression(
    val lambda: Double = 1e-4,
    val learningRate: Double = 0.5,
    val maxIter: Int = 500,
    val tol: Double = 1e-8,
) {

  /** Fitted model: standardization parameters plus weights and bias. */
  final case class Model(
      mean: Array[Double],
      std: Array[Double],
      weights: Array[Double],
      bias: Double,
  ) {
    /** P(label = 1 | x). */
    def predictProb(x: Array[Double]): Double = {
      var z = bias
      var j = 0
      while (j < weights.length) {
        z += weights(j) * (x(j) - mean(j)) / std(j)
        j += 1
      }
      LogisticRegression.sigmoid(z)
    }
  }

  /** Fit on dense features and 0/1 labels. */
  def fit(xs: Array[Array[Double]], ys: Array[Int]): Model = {
    require(xs.nonEmpty, "empty training set")
    require(xs.length == ys.length, "feature/label length mismatch")
    val n = xs.length
    val d = xs.head.length

    val mean = new Array[Double](d)
    val std = new Array[Double](d)
    var j = 0
    while (j < d) {
      var s = 0.0
      var i = 0
      while (i < n) { s += xs(i)(j); i += 1 }
      mean(j) = s / n
      var v = 0.0
      i = 0
      while (i < n) { val c = xs(i)(j) - mean(j); v += c * c; i += 1 }
      std(j) = math.max(math.sqrt(v / n), 1e-12)
      j += 1
    }
    val z = Array.tabulate(n, d)((i, jj) => (xs(i)(jj) - mean(jj)) / std(jj))

    val w = new Array[Double](d)
    var b = 0.0
    var iter = 0
    var moved = Double.MaxValue
    while (iter < maxIter && moved > tol) {
      val gw = new Array[Double](d)
      var gb = 0.0
      var i = 0
      while (i < n) {
        var dot = b
        var k = 0
        while (k < d) { dot += w(k) * z(i)(k); k += 1 }
        val err = LogisticRegression.sigmoid(dot) - ys(i)
        k = 0
        while (k < d) { gw(k) += err * z(i)(k); k += 1 }
        gb += err
        i += 1
      }
      moved = 0.0
      var k = 0
      while (k < d) {
        val step = learningRate * (gw(k) / n + lambda * w(k))
        w(k) -= step
        moved += math.abs(step)
        k += 1
      }
      val stepB = learningRate * gb / n
      b -= stepB
      moved += math.abs(stepB)
      iter += 1
    }
    Model(mean, std, w, b)
  }
}

object LogisticRegression {
  def sigmoid(z: Double): Double =
    if (z >= 0) 1.0 / (1.0 + math.exp(-z))
    else { val e = math.exp(z); e / (1.0 + e) }
}

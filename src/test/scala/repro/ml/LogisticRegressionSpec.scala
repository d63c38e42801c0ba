package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LogisticRegressionSpec extends AnyFunSuite {

  test("separates linearly separable 1-d data") {
    val xs = Array.tabulate(100)(i => Array(if (i < 50) -1.0 else 1.0))
    val ys = Array.tabulate(100)(i => if (i < 50) 0 else 1)
    val m = new LogisticRegression().fit(xs, ys)
    assert(m.predictProb(Array(-1.0)) < 0.15)
    assert(m.predictProb(Array(1.0)) > 0.85)
  }

  test("recovers monotone dependence on the informative feature") {
    val rng = new Random(0)
    val xs = Array.fill(2000) { Array(rng.nextGaussian(), rng.nextGaussian()) }
    val ys = xs.map(x => if (rng.nextDouble() < LogisticRegression.sigmoid(2 * x(0))) 1 else 0)
    val m = new LogisticRegression().fit(xs, ys)
    assert(m.predictProb(Array(2.0, 0.0)) > m.predictProb(Array(-2.0, 0.0)) + 0.5)
    // The uninformative feature moves the prediction far less.
    val d2 = math.abs(m.predictProb(Array(0.0, 2.0)) - m.predictProb(Array(0.0, -2.0)))
    assert(d2 < 0.2)
  }

  test("is roughly calibrated on a known generative model") {
    val rng = new Random(1)
    val xs = Array.fill(5000)(Array(rng.nextGaussian()))
    val ys = xs.map(x => if (rng.nextDouble() < LogisticRegression.sigmoid(x(0))) 1 else 0)
    val m = new LogisticRegression(maxIter = 2000).fit(xs, ys)
    // P(y=1 | x=0) should be near 0.5, x=1 near sigmoid(1)=0.73.
    assert(math.abs(m.predictProb(Array(0.0)) - 0.5) < 0.08)
    assert(math.abs(m.predictProb(Array(1.0)) - LogisticRegression.sigmoid(1.0)) < 0.1)
  }

  test("handles constant labels without diverging") {
    val xs = Array.fill(50)(Array(1.0, 2.0))
    val m = new LogisticRegression().fit(xs, Array.fill(50)(1))
    val p = m.predictProb(Array(1.0, 2.0))
    assert(!p.isNaN && p > 0.5)
  }

  test("handles a constant feature (zero variance) via the std floor") {
    val rng = new Random(2)
    val xs = Array.fill(200)(Array(3.0, rng.nextGaussian()))
    val ys = xs.map(x => if (x(1) > 0) 1 else 0)
    val m = new LogisticRegression().fit(xs, ys)
    assert(m.predictProb(Array(3.0, 2.0)) > 0.8)
    assert(m.predictProb(Array(3.0, -2.0)) < 0.2)
  }

  test("weights the more predictive of two correlated proxies") {
    val rng = new Random(3)
    val truth = Array.fill(3000)(rng.nextDouble())
    val good = truth.map(t => t + rng.nextGaussian() * 0.05)
    val junk = Array.fill(3000)(rng.nextDouble())
    val xs = Array.tabulate(3000)(i => Array(good(i), junk(i)))
    val ys = truth.map(t => if (rng.nextDouble() < t) 1 else 0)
    val m = new LogisticRegression().fit(xs, ys)
    assert(math.abs(m.weights(0)) > 3 * math.abs(m.weights(1)))
  }

  test("rejects empty and misaligned inputs") {
    val lr = new LogisticRegression()
    intercept[IllegalArgumentException] { lr.fit(Array.empty, Array.empty) }
    intercept[IllegalArgumentException] { lr.fit(Array(Array(1.0)), Array(1, 0)) }
  }

  test("sigmoid is stable at extreme arguments") {
    assert(LogisticRegression.sigmoid(1000.0) == 1.0)
    assert(LogisticRegression.sigmoid(-1000.0) == 0.0)
    assert(math.abs(LogisticRegression.sigmoid(0.0) - 0.5) < 1e-12)
  }
}

package repro.optim

import org.scalatest.funsuite.AnyFunSuite

class NelderMeadSpec extends AnyFunSuite {

  test("minimizes a 1-d quadratic") {
    val r = NelderMead.minimize(x => (x(0) - 3.0) * (x(0) - 3.0), Array(0.0))
    assert(math.abs(r.point(0) - 3.0) < 1e-4)
    assert(r.value < 1e-8)
  }

  test("minimizes a shifted 3-d quadratic") {
    val target = Array(1.0, -2.0, 0.5)
    def f(x: Array[Double]): Double =
      x.indices.map(i => (x(i) - target(i)) * (x(i) - target(i))).sum
    val r = NelderMead.minimize(f, Array(0.0, 0.0, 0.0))
    target.indices.foreach(i => assert(math.abs(r.point(i) - target(i)) < 1e-3))
  }

  test("minimizes the 2-d Rosenbrock function") {
    def f(x: Array[Double]): Double = {
      val a = 1 - x(0)
      val b = x(1) - x(0) * x(0)
      a * a + 100 * b * b
    }
    val r = NelderMead.minimize(f, Array(-1.0, 1.0), step = 0.5, maxIter = 5000)
    assert(math.abs(r.point(0) - 1.0) < 1e-2)
    assert(math.abs(r.point(1) - 1.0) < 1e-2)
  }

  test("handles a non-smooth max-of-linear objective") {
    // min over x of max(|x-1|, |x+1|) = 1 at x = 0.
    val r = NelderMead.minimize(x => math.max(math.abs(x(0) - 1), math.abs(x(0) + 1)), Array(5.0))
    assert(math.abs(r.point(0)) < 1e-3)
    assert(math.abs(r.value - 1.0) < 1e-3)
  }

  test("softmax outputs a probability vector") {
    val p = NelderMead.softmax(Array(1.0, 2.0, 3.0))
    assert(math.abs(p.sum - 1.0) < 1e-12)
    assert(p.forall(x => x > 0 && x < 1))
    assert(p(2) > p(1) && p(1) > p(0))
  }

  test("softmax is translation invariant and numerically stable") {
    val a = NelderMead.softmax(Array(1.0, 2.0))
    val b = NelderMead.softmax(Array(1001.0, 1002.0))
    assert(math.abs(a(0) - b(0)) < 1e-12)
    val c = NelderMead.softmax(Array(-1e6, 0.0))
    assert(!c.exists(_.isNaN))
  }

  test("minimizeOnSimplex returns a simplex point") {
    val r = NelderMead.minimizeOnSimplex(l => l.map(x => x * x).sum, 4)
    assert(math.abs(r.point.sum - 1.0) < 1e-9)
    assert(r.point.forall(_ >= 0))
  }

  test("minimizeOnSimplex of sum of squares finds the uniform point") {
    // min Σ λ² s.t. Σ λ = 1 is λ = 1/G.
    val g = 5
    val r = NelderMead.minimizeOnSimplex(l => l.map(x => x * x).sum, g)
    r.point.foreach(x => assert(math.abs(x - 1.0 / g) < 1e-3))
  }

  test("minimizeOnSimplex solves the minimax allocation with known answer") {
    // min max_g (c_g / λ_g): optimum shares λ_g ∝ c_g.
    val c = Array(1.0, 2.0, 4.0)
    val r = NelderMead.minimizeOnSimplex(
      l => c.indices.map(i => c(i) / math.max(l(i), 1e-12)).max, 3)
    val expected = c.map(_ / c.sum)
    c.indices.foreach(i => assert(math.abs(r.point(i) - expected(i)) < 5e-3,
      s"got ${r.point.toSeq}"))
  }

  test("minimizeOnSimplex dim=1 returns the single point") {
    val r = NelderMead.minimizeOnSimplex(l => l(0) * 2, 1)
    assert(r.point.toSeq == Seq(1.0))
  }

  test("minimize rejects empty dimension") {
    intercept[IllegalArgumentException] {
      NelderMead.minimize(_ => 0.0, Array.emptyDoubleArray)
    }
  }
}

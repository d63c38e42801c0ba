package repro.optim

/** Nelder–Mead downhill-simplex minimizer.
  *
  * The paper (§3.2, §4.5) solves the minimax group-by allocation
  * objectives (Eqs. 10–11) "via the Nelder–Mead simplex algorithm"; the
  * authors' implementation calls scipy. Offline, we implement the
  * standard algorithm (reflection / expansion / contraction / shrink
  * with the usual coefficients 1, 2, 0.5, 0.5) from scratch.
  *
  * [[NelderMead.minimize]] is the unconstrained minimizer;
  * [[NelderMead.minimizeOnSimplex]] handles the probability-simplex
  * constraint `Λ ∈ [0,1]^G, Σ Λ_l = 1` of Eqs. 10–11 by optimizing an
  * unconstrained logit vector and mapping it through softmax — the
  * substitution is smooth and surjective onto the open simplex, so the
  * unique minimizer of the convex objectives is preserved.
  */
object NelderMead {

  /** Result of a minimization: the best point found and its objective. */
  final case class Result(point: Array[Double], value: Double, iterations: Int)

  /** Minimize `f` starting from `x0` with initial simplex step `step`.
    *
    * @param maxIter  iteration cap
    * @param tol      terminate when the simplex's objective spread falls below this
    */
  def minimize(
      f: Array[Double] => Double,
      x0: Array[Double],
      step: Double = 0.1,
      maxIter: Int = 2000,
      tol: Double = 1e-10,
  ): Result = {
    val n = x0.length
    require(n >= 1, "dimension must be >= 1")
    // Initial simplex: x0 plus x0 perturbed along each axis.
    val points = Array.tabulate(n + 1) { i =>
      val p = x0.clone()
      if (i > 0) p(i - 1) += step
      p
    }
    val values = points.map(f)

    // Termination needs BOTH a small objective spread and a small simplex:
    // symmetric points (f(x−h) = f(x+h)) give zero value spread while the
    // simplex is still coarse.
    def xSpread(): Double = {
      var m = 0.0
      for (i <- 1 to n; j <- 0 until n)
        m = math.max(m, math.abs(points(i)(j) - points(0)(j)))
      m
    }
    var iter = 0
    while (iter < maxIter && ((values.max - values.min) > tol || xSpread() > 1e-8)) {
      // Order the simplex by objective value.
      val order = values.zipWithIndex.sortBy(_._1).map(_._2)
      val best = order.head
      val worst = order.last
      val secondWorst = order(n - 1)

      // Centroid of all points except the worst.
      val centroid = new Array[Double](n)
      var i = 0
      while (i <= n) {
        if (i != worst) {
          var j = 0
          while (j < n) { centroid(j) += points(i)(j) / n; j += 1 }
        }
        i += 1
      }

      def combine(alpha: Double): Array[Double] =
        Array.tabulate(n)(j => centroid(j) + alpha * (centroid(j) - points(worst)(j)))

      val reflected = combine(1.0)
      val fr = f(reflected)
      if (fr < values(best)) {
        val expanded = combine(2.0)
        val fe = f(expanded)
        if (fe < fr) { points(worst) = expanded; values(worst) = fe }
        else { points(worst) = reflected; values(worst) = fr }
      } else if (fr < values(secondWorst)) {
        points(worst) = reflected; values(worst) = fr
      } else {
        val contracted =
          if (fr < values(worst)) combine(0.5) // outside contraction
          else combine(-0.5) // inside contraction
        val fc = f(contracted)
        if (fc < math.min(fr, values(worst))) {
          points(worst) = contracted; values(worst) = fc
        } else {
          // Shrink every point toward the best.
          var k = 0
          while (k <= n) {
            if (k != best) {
              var j = 0
              while (j < n) {
                points(k)(j) = points(best)(j) + 0.5 * (points(k)(j) - points(best)(j))
                j += 1
              }
              values(k) = f(points(k))
            }
            k += 1
          }
        }
      }
      iter += 1
    }

    val bestIdx = values.zipWithIndex.minBy(_._1)._2
    Result(points(bestIdx), values(bestIdx), iter)
  }

  /** Numerically stable softmax onto the probability simplex. */
  def softmax(logits: Array[Double]): Array[Double] = {
    val m = logits.max
    val exps = logits.map(l => math.exp(l - m))
    val s = exps.sum
    exps.map(_ / s)
  }

  /** Minimize `f(Λ)` over the probability simplex `Λ ∈ [0,1]^g, Σ Λ = 1`.
    *
    * Optimizes logits unconstrained (fixing the first logit at 0 to remove
    * the softmax's translation degeneracy) and returns the simplex point.
    */
  def minimizeOnSimplex(
      f: Array[Double] => Double,
      dim: Int,
      maxIter: Int = 2000,
      tol: Double = 1e-12,
  ): Result = {
    require(dim >= 1, "dimension must be >= 1")
    if (dim == 1) return Result(Array(1.0), f(Array(1.0)), 0)
    def unpack(free: Array[Double]): Array[Double] = softmax(0.0 +: free)
    val inner = minimize(free => f(unpack(free)), new Array[Double](dim - 1),
      step = 0.5, maxIter = maxIter, tol = tol)
    Result(unpack(inner.point), inner.value, inner.iterations)
  }
}

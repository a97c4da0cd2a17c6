package repro.linalg

/** Derivative-free Nelder-Mead simplex minimizer — used by TBATS to fit its
  * smoothing parameters by (Gaussian) maximum likelihood, which is exactly
  * the repeated-full-pass structure that makes real TBATS slow.
  */
object NelderMead {
  /** Minimize `f` from `x0`; each coordinate optionally clamped to bounds.
    * `maxEvals` bounds objective evaluations (the per-eval cost dominates).
    */
  def minimize(f: Array[Double] => Double, x0: Array[Double],
               lower: Array[Double], upper: Array[Double],
               maxEvals: Int = 120, step: Double = 0.1): Array[Double] = {
    val n = x0.length
    require(lower.length == n && upper.length == n, "bounds dim mismatch")
    def clamp(x: Array[Double]): Array[Double] =
      Array.tabulate(n)(i => math.min(upper(i), math.max(lower(i), x(i))))
    var evals = 0
    def eval(x: Array[Double]): Double = { evals += 1; f(clamp(x)) }

    // initial simplex
    var simplex = Array.tabulate(n + 1) { i =>
      val x = x0.clone()
      if (i > 0) x(i - 1) += step
      x
    }
    var fv = simplex.map(eval)

    while (evals < maxEvals) {
      val order = fv.indices.sortBy(fv)
      simplex = order.map(simplex).toArray
      fv = order.map(fv).toArray
      val centroid = new Array[Double](n)
      for (i <- 0 until n; j <- 0 until n) centroid(j) += simplex(i)(j) / n
      val worst = simplex(n)
      val refl = Array.tabulate(n)(j => centroid(j) + (centroid(j) - worst(j)))
      val fr = eval(refl)
      if (fr < fv(0)) {
        val exp = Array.tabulate(n)(j => centroid(j) + 2.0 * (centroid(j) - worst(j)))
        val fe = eval(exp)
        if (fe < fr) { simplex(n) = exp; fv(n) = fe } else { simplex(n) = refl; fv(n) = fr }
      } else if (fr < fv(n - 1)) {
        simplex(n) = refl; fv(n) = fr
      } else {
        val con = Array.tabulate(n)(j => centroid(j) + 0.5 * (worst(j) - centroid(j)))
        val fc = eval(con)
        if (fc < fv(n)) { simplex(n) = con; fv(n) = fc }
        else {
          // shrink toward best
          var i = 1
          while (i <= n) {
            simplex(i) = Array.tabulate(n)(j => simplex(0)(j) + 0.5 * (simplex(i)(j) - simplex(0)(j)))
            fv(i) = eval(simplex(i))
            i += 1
          }
        }
      }
    }
    clamp(simplex(fv.indices.minBy(fv)))
  }
}

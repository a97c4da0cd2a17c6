package repro.baselines

import repro.core.Decomposition
import repro.linalg.{Mat, NelderMead, Vec}

/** TBATS (De Livera, Hyndman & Snyder) — trigonometric-seasonality
  * exponential-smoothing state space, simplified: no Box-Cox, no ARMA errors.
  *
  * State x = [level, damped trend, (s_j, s*_j) per harmonic per period];
  * observation ŷ = wᵀx; update x' = F x + g ε with the *dense* d×d transition
  * F — the honest per-point O(d²) cost, repeated inside a Nelder-Mead
  * likelihood search over the smoothing parameters (α, β, φ, γ₁p, γ₂p),
  * which is exactly the structure that makes real TBATS an O(1)/s algorithm.
  *
  * Decomposition: trend = level + damped-trend contribution (the paper notes
  * "sum of trend and level is equivalent to standard trend"), seasonal_p =
  * observed part of period p's harmonic states, residual = one-step error.
  */
final class TBATS(maxHarmonics: Int = 12, maxEvals: Int = 120) extends Decomposer {
  override def name: String = "TBATS"

  override def decompose(xs: Array[Double], periods: Seq[Int]): Decomposition = {
    val ms = periods.toArray
    val ks = ms.map(m => math.max(1, math.min(m / 2, maxHarmonics)))
    // θ = [α, β, φ] ++ [γ1_p, γ2_p]*
    val x0 = Array(0.05, 0.005, 0.98) ++ ms.flatMap(_ => Array(0.01, 0.01))
    val lo = Array(1e-4, 0.0, 0.80) ++ ms.flatMap(_ => Array(0.0, 0.0))
    val hi = Array(0.5, 0.1, 0.999) ++ ms.flatMap(_ => Array(0.2, 0.2))
    val best = NelderMead.minimize(theta => run(xs, ms, ks, theta, collect = false)._1,
                                   x0, lo, hi, maxEvals)
    run(xs, ms, ks, best, collect = true)._2
  }

  /** One filtering pass. Returns (SSE, decomposition-if-collected). */
  private def run(xs: Array[Double], ms: Array[Int], ks: Array[Int],
                  theta: Array[Double], collect: Boolean): (Double, Decomposition) = {
    val n = xs.length
    val alpha = theta(0); val beta = theta(1); val phi = theta(2)
    val d = 2 + 2 * ks.sum

    // transition F, gain g, observation w — rebuilt per call because φ and
    // the γs live inside them.
    val f = Mat.zeros(d, d)
    val g = new Array[Double](d)
    val w = new Array[Double](d)
    f(0, 0) = 1.0; f(0, 1) = phi; g(0) = alpha; w(0) = 1.0
    f(1, 1) = phi; g(1) = beta; w(1) = phi
    var off = 2
    var pi = 0
    while (pi < ms.length) {
      val m = ms(pi); val k = ks(pi)
      val g1 = theta(3 + 2 * pi); val g2 = theta(4 + 2 * pi)
      var j = 1
      while (j <= k) {
        val lam = 2.0 * math.Pi * j / m
        val c = math.cos(lam); val s = math.sin(lam)
        val a = off + 2 * (j - 1); val b = a + 1
        f(a, a) = c; f(a, b) = s
        f(b, a) = -s; f(b, b) = c
        g(a) = g1; g(b) = g2
        w(a) = 1.0 // s_j observed; s*_j not
        j += 1
      }
      off += 2 * k
      pi += 1
    }

    // initial state: level = mean of first period, trend 0, seasonal states
    // from Fourier coefficients of cyclic-mean patterns extracted
    // *sequentially* (each period's pattern removed from the working series
    // before the next period's is estimated, so shared harmonics are not
    // double-counted).
    val x = new Array[Double](d)
    val warm = math.min(n, 2 * ms.max)
    x(0) = xs.take(math.min(n, ms.max)).sum / math.min(n, ms.max)
    val warmRes = Array.tabulate(warm)(t => xs(t) - x(0))
    off = 2
    pi = 0
    while (pi < ms.length) {
      val m = ms(pi); val k = ks(pi)
      val pattern = new Array[Double](m); val cnt = new Array[Int](m)
      var t = 0
      while (t < warm) { pattern(t % m) += warmRes(t); cnt(t % m) += 1; t += 1 }
      var r = 0
      while (r < m) { if (cnt(r) > 0) pattern(r) /= cnt(r); r += 1 }
      t = 0
      while (t < warm) { warmRes(t) -= pattern(t % m); t += 1 }
      var j = 1
      while (j <= k) {
        var a = 0.0; var b = 0.0
        r = 0
        while (r < m) {
          val lam = 2.0 * math.Pi * j * r / m
          a += pattern(r) * math.cos(lam)
          b += pattern(r) * math.sin(lam)
          r += 1
        }
        x(off + 2 * (j - 1)) = 2.0 * a / m
        x(off + 2 * (j - 1) + 1) = 2.0 * b / m
        j += 1
      }
      off += 2 * k
      pi += 1
    }

    val trend = if (collect) new Array[Double](n) else null
    val seas = if (collect) ms.map(_ => new Array[Double](n)) else null
    val resid = if (collect) new Array[Double](n) else null
    var sse = 0.0
    var state = x
    var t = 0
    while (t < n) {
      val yhat = Vec.dot(w, state)
      val eps = xs(t) - yhat
      sse += eps * eps
      if (collect) {
        trend(t) = state(0) + phi * state(1)
        var o = 2; var p2 = 0
        while (p2 < ms.length) {
          var sv = 0.0; var j = 0
          while (j < ks(p2)) { sv += state(o + 2 * j); j += 1 }
          seas(p2)(t) = sv
          o += 2 * ks(p2); p2 += 1
        }
        resid(t) = eps
      }
      val next = f.mv(state) // the honest dense O(d²) transition
      Vec.axpy(eps, g, next)
      state = next
      t += 1
    }
    val dec = if (collect) Decomposition(trend, seas.toSeq, resid) else null
    (sse, dec)
  }
}

package repro.linalg

/** Conjugate gradient for symmetric positive-definite operators given as a
  * matvec closure — lets STR/RobustSTL solve their normal equations with
  * O(n) sparse matvecs instead of materializing dense matrices.
  */
object CG {
  /** Solve A x = b where `applyA` computes A·x; stops at `maxIter` or when
    * the residual norm falls below `tol·||b||`.
    */
  def solve(applyA: Array[Double] => Array[Double], b: Array[Double],
            maxIter: Int = 200, tol: Double = 1e-8,
            x0: Option[Array[Double]] = None): Array[Double] = {
    val n = b.length
    val x = x0.map(_.clone()).getOrElse(new Array[Double](n))
    val r = Vec.sub(b, applyA(x))
    val p = r.clone()
    var rr = Vec.dot(r, r)
    val stop = tol * tol * math.max(Vec.dot(b, b), 1e-300)
    var it = 0
    while (it < maxIter && rr > stop) {
      val ap = applyA(p)
      val denom = Vec.dot(p, ap)
      if (denom <= 0.0) return x // operator not PD along p; bail with best x
      val alpha = rr / denom
      Vec.axpy(alpha, p, x)
      Vec.axpy(-alpha, ap, r)
      val rr2 = Vec.dot(r, r)
      val beta = rr2 / rr
      var i = 0
      while (i < n) { p(i) = r(i) + beta * p(i); i += 1 }
      rr = rr2
      it += 1
    }
    x
  }
}

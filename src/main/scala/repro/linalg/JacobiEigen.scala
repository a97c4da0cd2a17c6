package repro.linalg

/** Cyclic Jacobi eigendecomposition of a symmetric matrix — the O(L³)
  * workhorse behind SSA. Returns eigenvalues in descending order with the
  * matching eigenvectors (columns).
  */
object JacobiEigen {
  final case class Eigen(values: Array[Double], vectors: Mat)

  def decompose(s: Mat, maxSweeps: Int = 30, tol: Double = 1e-10): Eigen = {
    require(s.rows == s.cols, "matrix must be square")
    val n = s.rows
    val a = s.copy
    val v = Mat.eye(n)

    def offdiag(): Double = {
      var sum = 0.0
      var i = 0
      while (i < n) {
        var j = i + 1
        while (j < n) { sum += a(i, j) * a(i, j); j += 1 }
        i += 1
      }
      sum
    }

    var sweep = 0
    var off = offdiag()
    val scale = {
      var d = 0.0; var i = 0
      while (i < n) { d += a(i, i) * a(i, i); i += 1 }
      math.max(d, 1e-300)
    }
    while (sweep < maxSweeps && off > tol * scale) {
      var p = 0
      while (p < n - 1) {
        var q = p + 1
        while (q < n) {
          val apq = a(p, q)
          if (math.abs(apq) > 1e-300) {
            val theta = (a(q, q) - a(p, p)) / (2.0 * apq)
            val t = math.signum(theta) / (math.abs(theta) + math.sqrt(theta * theta + 1.0))
            val tt = if (theta == 0.0) 1.0 else t
            val c = 1.0 / math.sqrt(tt * tt + 1.0)
            val sn = tt * c
            // rotate rows/cols p,q of a
            var i = 0
            while (i < n) {
              val aip = a(i, p); val aiq = a(i, q)
              a(i, p) = c * aip - sn * aiq
              a(i, q) = sn * aip + c * aiq
              i += 1
            }
            i = 0
            while (i < n) {
              val api = a(p, i); val aqi = a(q, i)
              a(p, i) = c * api - sn * aqi
              a(q, i) = sn * api + c * aqi
              i += 1
            }
            // accumulate eigenvectors
            i = 0
            while (i < n) {
              val vip = v(i, p); val viq = v(i, q)
              v(i, p) = c * vip - sn * viq
              v(i, q) = sn * vip + c * viq
              i += 1
            }
          }
          q += 1
        }
        p += 1
      }
      off = offdiag()
      sweep += 1
    }
    // sort descending by eigenvalue
    val order = (0 until n).sortBy(i => -a(i, i))
    val vals = order.map(i => a(i, i)).toArray
    val vecs = Mat.zeros(n, n)
    for ((src, dst) <- order.zipWithIndex; i <- 0 until n) vecs(i, dst) = v(i, src)
    Eigen(vals, vecs)
  }
}

package repro.linalg

/** Minimal dense row-major matrix. The offline container has no math
  * libraries, so the baselines' solvers are built on this.
  */
final class Mat(val rows: Int, val cols: Int, val a: Array[Double]) extends Serializable {
  require(a.length == rows * cols, s"backing array ${a.length} != $rows x $cols")

  @inline def apply(i: Int, j: Int): Double = a(i * cols + j)
  @inline def update(i: Int, j: Int, v: Double): Unit = a(i * cols + j) = v

  /** y = this * x. */
  def mv(x: Array[Double]): Array[Double] = {
    require(x.length == cols, s"dim mismatch: $cols vs ${x.length}")
    val y = new Array[Double](rows)
    var i = 0
    while (i < rows) {
      var s = 0.0; var j = 0; val off = i * cols
      while (j < cols) { s += a(off + j) * x(j); j += 1 }
      y(i) = s
      i += 1
    }
    y
  }

  /** y = thisᵀ * x. */
  def tmv(x: Array[Double]): Array[Double] = {
    require(x.length == rows, s"dim mismatch: $rows vs ${x.length}")
    val y = new Array[Double](cols)
    var i = 0
    while (i < rows) {
      val xi = x(i); val off = i * cols
      var j = 0
      while (j < cols) { y(j) += a(off + j) * xi; j += 1 }
      i += 1
    }
    y
  }

  def copy: Mat = new Mat(rows, cols, a.clone())
}

object Mat {
  def zeros(rows: Int, cols: Int): Mat = new Mat(rows, cols, new Array[Double](rows * cols))

  def eye(n: Int): Mat = {
    val m = zeros(n, n)
    var i = 0; while (i < n) { m(i, i) = 1.0; i += 1 }
    m
  }

  /** Dense C = A * B (used only for small TBATS transition products). */
  def mm(x: Mat, y: Mat): Mat = {
    require(x.cols == y.rows, s"dim mismatch: ${x.cols} vs ${y.rows}")
    val c = zeros(x.rows, y.cols)
    var i = 0
    while (i < x.rows) {
      var kk = 0
      while (kk < x.cols) {
        val v = x(i, kk)
        if (v != 0.0) {
          var j = 0
          while (j < y.cols) { c(i, j) += v * y(kk, j); j += 1 }
        }
        kk += 1
      }
      i += 1
    }
    c
  }
}

/** Shared small vector helpers. */
object Vec {
  def dot(x: Array[Double], y: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < x.length) { s += x(i) * y(i); i += 1 }
    s
  }
  def axpy(alpha: Double, x: Array[Double], y: Array[Double]): Unit = {
    var i = 0; while (i < x.length) { y(i) += alpha * x(i); i += 1 }
  }
  def norm2(x: Array[Double]): Double = math.sqrt(dot(x, x))
  def sub(x: Array[Double], y: Array[Double]): Array[Double] =
    Array.tabulate(x.length)(i => x(i) - y(i))
}

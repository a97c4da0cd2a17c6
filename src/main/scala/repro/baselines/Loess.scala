package repro.baselines

import repro.core.TricubeKernel

/** Loess smoothing (Cleveland): local weighted linear regression with
  * tri-cube weights over the `span` nearest neighbours — the substrate of
  * classical STL. Supports STL's `jump` speedup (fit every jump-th point,
  * linearly interpolate between).
  */
object Loess {

  /** Smooth an evenly spaced series. `span` is the window size in points
    * (made odd, >= 3); `degree` 0 (weighted mean) or 1 (local line).
    */
  def smooth(xs: Array[Double], span: Int, degree: Int = 1, jump: Int = 1): Array[Double] = {
    val n = xs.length
    if (n == 0) return xs
    val q = math.max(3, if (span % 2 == 0) span + 1 else span)
    val out = new Array[Double](n)
    val step = math.max(1, jump)
    var anchor = 0
    var prevFit = 0.0
    var prevIdx = -1
    while (anchor < n) {
      val fit = fitAt(xs, anchor, q, degree)
      out(anchor) = fit
      if (prevIdx >= 0 && anchor - prevIdx > 1) {
        // linear interpolation between fitted anchors
        var i = prevIdx + 1
        while (i < anchor) {
          val f = (i - prevIdx).toDouble / (anchor - prevIdx)
          out(i) = prevFit + f * (fit - prevFit)
          i += 1
        }
      }
      prevIdx = anchor; prevFit = fit
      if (anchor == n - 1) anchor = n // done
      else anchor = math.min(anchor + step, n - 1)
    }
    out
  }

  /** Weighted local regression value at index `i` using the `q` nearest points. */
  private def fitAt(xs: Array[Double], i: Int, q: Int, degree: Int): Double = {
    val n = xs.length
    val h = q / 2
    var lo = i - h
    var hi = i + h
    if (lo < 0) { hi = math.min(n - 1, hi - lo); lo = 0 }
    if (hi > n - 1) { lo = math.max(0, lo - (hi - (n - 1))); hi = n - 1 }
    val maxDist = math.max(math.max(i - lo, hi - i), 1)
    var sw = 0.0; var swx = 0.0; var swy = 0.0; var swxx = 0.0; var swxy = 0.0
    var j = lo
    while (j <= hi) {
      val w = TricubeKernel.W(math.abs(j - i).toDouble / (maxDist + 1))
      val dx = (j - i).toDouble
      sw += w; swx += w * dx; swy += w * xs(j)
      swxx += w * dx * dx; swxy += w * dx * xs(j)
      j += 1
    }
    if (sw <= 0.0) return xs(i)
    if (degree == 0) swy / sw
    else {
      val det = sw * swxx - swx * swx
      if (math.abs(det) < 1e-12) swy / sw
      else {
        val b = (sw * swxy - swx * swy) / det   // slope
        val a = (swy - b * swx) / sw            // intercept at dx = 0
        a
      }
    }
  }
}

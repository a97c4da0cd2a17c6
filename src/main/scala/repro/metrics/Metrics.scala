package repro.metrics

import repro.core.Decomposition

/** Evaluation metrics from paper §7.3.
  *
  * MASE scales a mean absolute error by the in-sample seasonal-naive error of
  * the observed series (`mean |X_t - X_{t-m}|`, m = the primary seasonality),
  * making scores comparable across datasets. Trend smoothness is the standard
  * deviation of the first difference of the trend; Table 3 reports it on a
  * log scale, Table 4 raw.
  */
object Metrics {

  /** Seasonal-naive scale `mean_{t>=m} |x_t - x_{t-m}|`. */
  def seasonalNaiveScale(x: Array[Double], m: Int): Double = {
    require(x.length > m, s"series of ${x.length} too short for period $m")
    var s = 0.0
    var t = m
    while (t < x.length) { s += math.abs(x(t) - x(t - m)); t += 1 }
    val v = s / (x.length - m)
    if (v > 0.0) v else 1e-12
  }

  def mae(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"length mismatch ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += math.abs(a(i) - b(i)); i += 1 }
    s / a.length
  }

  /** MASE of the residual: MAE(x, trend + Σ seasonals) / seasonal-naive scale. */
  def maseResidual(x: Array[Double], d: Decomposition, m: Int): Double =
    mae(x, d.fitted) / seasonalNaiveScale(x, m)

  /** MASE of an estimated component against its known true values, scaled by
    * the observed series' seasonal-naive error (Table 4).
    */
  def maseVsTruth(estimate: Array[Double], truth: Array[Double],
                  observed: Array[Double], m: Int): Double =
    mae(estimate, truth) / seasonalNaiveScale(observed, m)

  /** Std-dev of the first difference of the trend (lower = smoother). */
  def trendSmoothness(trend: Array[Double]): Double = {
    require(trend.length >= 3, "trend too short")
    val d = Array.tabulate(trend.length - 1)(i => trend(i + 1) - trend(i))
    val mean = d.sum / d.length
    math.sqrt(d.map(v => (v - mean) * (v - mean)).sum / d.length)
  }

  /** Table 3 reports smoothness on the natural-log scale. */
  def logTrendSmoothness(trend: Array[Double]): Double =
    math.log(math.max(trendSmoothness(trend), 1e-12))
}

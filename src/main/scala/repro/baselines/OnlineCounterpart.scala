package repro.baselines

import repro.core.{Decomposition, DecompPoint}
import scala.collection.mutable.ArrayBuffer

/** Generic online counterpart of a batch algorithm (paper §7.1): for each
  * arriving point, re-run the batch decomposition on a sliding window of the
  * last `windowFactor · max(periods)` points and emit the decomposition of
  * the newest point. Deliberately expensive — "the natural extension of any
  * batch algorithm to online".
  */
final class OnlineCounterpart(batch: Decomposer, windowFactor: Int = 4) extends Serializable {
  def name: String = s"Online ${batch.name}"

  /** Minimum points before the first emission (2 periods of history). */
  def minPoints(periods: Seq[Int]): Int = 2 * periods.max

  /** Run over a whole series; for the warm-up prefix (before `minPoints`)
    * the first full-window batch decomposition supplies the values, mirroring
    * how OnlineSTL back-fills its init window.
    */
  def decomposeAll(xs: Array[Double], periods: Seq[Int]): Decomposition = {
    val n = xs.length
    val m = periods.max
    val window = windowFactor * m
    val warm = math.min(math.max(minPoints(periods), window), n)
    val pts = new ArrayBuffer[DecompPoint](n)
    // back-fill the warm-up prefix from one batch run on it
    val head = batch.decompose(xs.take(warm), periods)
    for (i <- 0 until warm)
      pts += DecompPoint(i, xs(i), head.trend(i),
        Array.tabulate(periods.length)(p => head.seasonals(p)(i)), head.residual(i))
    var t = warm
    while (t < n) {
      val lo = math.max(0, t + 1 - window)
      val win = java.util.Arrays.copyOfRange(xs, lo, t + 1)
      val d = batch.decompose(win, periods)
      val last = win.length - 1
      pts += DecompPoint(t, xs(t), d.trend(last),
        Array.tabulate(periods.length)(p => d.seasonals(p)(last)), d.residual(last))
      t += 1
    }
    Decomposition.fromPoints(pts.toSeq, periods.length)
  }

  /** Measure per-point latency: run `steps` single-point updates at the end
    * of `xs` and return seconds per point (throughput harness for Table 1).
    */
  def secondsPerPoint(xs: Array[Double], periods: Seq[Int], steps: Int): Double = {
    val n = xs.length
    val window = windowFactor * periods.max
    require(n > window + steps, s"need > ${window + steps} points, got $n")
    val t0 = System.nanoTime()
    var t = n - steps
    while (t < n) {
      val lo = math.max(0, t + 1 - window)
      val win = java.util.Arrays.copyOfRange(xs, lo, t + 1)
      batch.decompose(win, periods)
      t += 1
    }
    (System.nanoTime() - t0) / 1e9 / steps
  }
}

package repro.baselines

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class STRSpec extends SparkSpec {

  private def series(n: Int, m: Int, slope: Double, amp: Double,
                     noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      2.0 + slope * t + amp * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * noise)
  }

  test("decomposition identity: X = T + S + R") {
    val xs = series(120, 12, 0.05, 3.0, 0.3, 1)
    val d = new STR().decompose(xs, Seq(12))
    for (i <- xs.indices)
      assert(math.abs(d.trend(i) + d.seasonals.head(i) + d.residual(i) - xs(i)) < 1e-9)
  }

  test("dense path recovers trend and seasonality (small system)") {
    val m = 10
    val xs = series(150, m, 0.1, 4.0, 0.0, 2)
    val d = new STR().decompose(xs, Seq(m))
    val interior = m until (xs.length - m)
    val trendMae = interior.map(i => math.abs(d.trend(i) - (2.0 + 0.1 * i))).sum / interior.size
    assert(trendMae < 1.0, s"trend MAE $trendMae")
    val seasMae = interior.map(i =>
      math.abs(d.seasonals.head(i) - 4.0 * math.sin(2 * math.Pi * i / m))).sum / interior.size
    assert(seasMae < 0.8, s"seasonal MAE $seasMae")
  }

  test("CG path agrees with dense path on the same problem") {
    val m = 8
    val xs = series(100, m, 0.05, 2.0, 0.2, 3)
    val dense = new STR(denseLimit = 10000).decompose(xs, Seq(m))
    val cg = new STR(denseLimit = 1).decompose(xs, Seq(m))
    val trendDiff = dense.trend.zip(cg.trend).map { case (a, b) => math.abs(a - b) }.max
    val seasDiff = dense.seasonals.head.zip(cg.seasonals.head)
      .map { case (a, b) => math.abs(a - b) }.max
    assert(trendDiff < 0.2, s"trend dense-vs-CG diff $trendDiff")
    assert(seasDiff < 0.2, s"seasonal dense-vs-CG diff $seasDiff")
  }

  test("seasonal component sums to ~0 over one period (sum-zero penalty)") {
    val m = 12
    val xs = series(144, m, 0.0, 3.0, 0.1, 4)
    val d = new STR().decompose(xs, Seq(m))
    val cycle = d.seasonals.head.take(m).sum
    assert(math.abs(cycle) < 0.5, s"cycle sum $cycle")
  }

  test("seasonal component is exactly periodic (static phase parametrization)") {
    val m = 9
    val xs = series(120, m, 0.02, 2.0, 0.3, 5)
    val d = new STR().decompose(xs, Seq(m))
    for (t <- 0 until xs.length - m)
      assert(d.seasonals.head(t) == d.seasonals.head(t + m))
  }

  test("trend is very smooth (strong second-difference penalty)") {
    val m = 10
    val xs = series(200, m, 0.05, 3.0, 0.5, 6)
    val d = new STR().decompose(xs, Seq(m))
    assert(Metrics.trendSmoothness(d.trend) < 0.1 * Metrics.trendSmoothness(xs))
  }

  test("multiple seasonalities handled jointly") {
    val rng = new Random(7)
    val xs = Array.tabulate(400)(t =>
      1.0 + 0.02 * t + 2.0 * math.sin(2 * math.Pi * t / 5) +
        4.0 * math.sin(2 * math.Pi * t / 20) + rng.nextGaussian() * 0.2)
    val d = new STR().decompose(xs, Seq(5, 20))
    assert(d.seasonals.size == 2)
    val mase = Metrics.maseResidual(xs, d, 20)
    assert(mase < 1.0, s"MASE $mase")
  }

  test("MASE beats seasonal naive on noisy seasonal data") {
    val xs = series(200, 10, 0.03, 5.0, 0.5, 8)
    val d = new STR().decompose(xs, Seq(10))
    assert(Metrics.maseResidual(xs, d, 10) < 1.0)
  }
}

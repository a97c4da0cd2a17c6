package repro.baselines

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class BatchSTLSpec extends SparkSpec {

  private def series(n: Int, m: Int, slope: Double, amp: Double,
                     noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      5.0 + slope * t + amp * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * noise)
  }

  test("decomposition identity: X = T + S + R") {
    val m = 12
    val xs = series(12 * m, m, 0.05, 3.0, 0.4, 1)
    val d = new BatchSTL().decompose(xs, Seq(m))
    for (i <- xs.indices)
      assert(math.abs(d.trend(i) + d.seasonals.head(i) + d.residual(i) - xs(i)) < 1e-9)
  }

  test("rejects multiple periods (MSTL handles those)") {
    intercept[IllegalArgumentException](
      new BatchSTL().decompose(Array.fill(100)(1.0), Seq(5, 10)))
  }

  test("rejects series shorter than 2 periods") {
    intercept[IllegalArgumentException](
      new BatchSTL().decompose(Array.fill(19)(1.0), Seq(10)))
  }

  test("recovers linear trend on noise-free seasonal data") {
    val m = 10
    val xs = series(20 * m, m, 0.1, 2.0, 0.0, 2)
    val d = new BatchSTL().decompose(xs, Seq(m))
    val interior = (2 * m) until (xs.length - 2 * m)
    val maxErr = interior.map(i => math.abs(d.trend(i) - (5.0 + 0.1 * i))).max
    assert(maxErr < 0.5, s"max trend err $maxErr")
  }

  test("recovers the seasonal pattern on noise-free data") {
    val m = 8
    val xs = series(25 * m, m, 0.0, 4.0, 0.0, 3)
    val d = new BatchSTL().decompose(xs, Seq(m))
    val interior = (2 * m) until (xs.length - 2 * m)
    val maxErr = interior.map(i =>
      math.abs(d.seasonals.head(i) - 4.0 * math.sin(2 * math.Pi * i / m))).max
    assert(maxErr < 0.4, s"max seasonal err $maxErr")
  }

  test("residual of noisy data is small relative to seasonal amplitude") {
    val m = 12
    val xs = series(15 * m, m, 0.02, 5.0, 0.5, 4)
    val d = new BatchSTL().decompose(xs, Seq(m))
    val mase = Metrics.maseResidual(xs, d, m)
    assert(mase < 1.0, s"MASE $mase")
  }

  test("seasonal component is roughly centered (low-pass removes level)") {
    val m = 10
    val xs = series(20 * m, m, 0.0, 3.0, 0.2, 5)
    val d = new BatchSTL().decompose(xs, Seq(m))
    val mean = d.seasonals.head.sum / xs.length
    assert(math.abs(mean) < 0.3, s"seasonal mean $mean")
  }

  test("trend is smoother than the input") {
    val m = 7
    val xs = series(30 * m, m, 0.01, 2.0, 1.0, 6)
    val d = new BatchSTL().decompose(xs, Seq(m))
    assert(Metrics.trendSmoothness(d.trend) < Metrics.trendSmoothness(xs))
  }

  test("movingAverage matches manual computation and shrinks length") {
    val stl = new BatchSTL()
    val out = stl.movingAverage(Array(1.0, 2.0, 3.0, 4.0, 5.0), 3)
    assert(out.toSeq == Seq(2.0, 3.0, 4.0))
  }

  test("movingAverage rejects windows longer than the series") {
    intercept[IllegalArgumentException](new BatchSTL().movingAverage(Array(1.0, 2.0), 5))
  }

  for (m <- Seq(5, 12, 24)) {
    test(s"period m=$m: output lengths match input") {
      val xs = series(10 * m, m, 0.03, 2.0, 0.3, m)
      val d = new BatchSTL().decompose(xs, Seq(m))
      assert(d.trend.length == xs.length)
      assert(d.seasonals.head.length == xs.length)
      assert(d.residual.length == xs.length)
    }
  }
}

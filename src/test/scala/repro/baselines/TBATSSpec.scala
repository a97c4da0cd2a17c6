package repro.baselines

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class TBATSSpec extends SparkSpec {

  private def series(n: Int, m: Int, slope: Double, amp: Double,
                     noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      20.0 + slope * t + amp * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * noise)
  }

  test("decomposition identity: X = T + S + R (one-step errors close the sum)") {
    val xs = series(240, 12, 0.05, 3.0, 0.3, 1)
    val d = new TBATS(maxEvals = 40).decompose(xs, Seq(12))
    for (i <- xs.indices) {
      val recon = d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i)
      assert(math.abs(recon - xs(i)) < 1e-6, s"identity at $i")
    }
  }

  test("level tracks a linear trend") {
    val xs = series(300, 10, 0.1, 2.0, 0.0, 2)
    val d = new TBATS(maxEvals = 60).decompose(xs, Seq(10))
    val tail = (xs.length / 2) until xs.length
    val mae = tail.map(i => math.abs(d.trend(i) - (20.0 + 0.1 * i))).sum / tail.size
    assert(mae < 3.0, s"trend MAE $mae")
  }

  test("harmonic states capture a stationary sinusoid") {
    val m = 12
    val xs = series(25 * m, m, 0.0, 5.0, 0.0, 3)
    val d = new TBATS(maxEvals = 60).decompose(xs, Seq(m))
    val tail = (xs.length - 5 * m) until xs.length
    val mae = tail.map(i =>
      math.abs(d.seasonals.head(i) - 5.0 * math.sin(2 * math.Pi * i / m))).sum / tail.size
    assert(mae < 1.5, s"seasonal MAE $mae")
  }

  test("one-step residuals shrink after warm-up on clean data") {
    val m = 10
    val xs = series(30 * m, m, 0.02, 4.0, 0.0, 4)
    val d = new TBATS(maxEvals = 60).decompose(xs, Seq(m))
    val early = (m until 3 * m).map(i => math.abs(d.residual(i))).sum / (2 * m)
    val late = (xs.length - 2 * m until xs.length).map(i => math.abs(d.residual(i))).sum / (2 * m)
    assert(late < early, s"residuals did not shrink: early $early late $late")
  }

  test("MASE beats seasonal naive on noisy seasonal data") {
    val m = 12
    val xs = series(30 * m, m, 0.02, 5.0, 0.5, 5)
    val d = new TBATS(maxEvals = 60).decompose(xs, Seq(m))
    assert(Metrics.maseResidual(xs, d, m) < 1.0)
  }

  test("supports two seasonal periods") {
    val rng = new Random(6)
    val xs = Array.tabulate(600)(t =>
      10.0 + 2.0 * math.sin(2 * math.Pi * t / 6) + 4.0 * math.sin(2 * math.Pi * t / 24) +
        rng.nextGaussian() * 0.3)
    val d = new TBATS(maxEvals = 60).decompose(xs, Seq(6, 24))
    assert(d.seasonals.size == 2)
    // note: the m=24 seasonal-naive scale cancels *both* seasonal components,
    // so the denominator is noise-only — 2.0 is a tight bound here.
    assert(Metrics.maseResidual(xs, d, 24) < 2.0)
  }

  test("harmonic count respects the cap") {
    // period 100 with maxHarmonics=3 must not blow up the state dimension;
    // finishing quickly implies d = 2 + 2*3 rather than 2 + 100
    val xs = series(500, 100, 0.01, 3.0, 0.1, 7)
    val t0 = System.nanoTime()
    new TBATS(maxHarmonics = 3, maxEvals = 20).decompose(xs, Seq(100))
    assert((System.nanoTime() - t0) / 1e9 < 30)
  }
}

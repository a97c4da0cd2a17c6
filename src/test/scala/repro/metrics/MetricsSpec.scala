package repro.metrics

import repro.SparkSpec
import repro.core.Decomposition
import scala.util.Random

class MetricsSpec extends SparkSpec {

  test("mae of identical arrays is zero") {
    val a = Array(1.0, 2.0, 3.0)
    assert(Metrics.mae(a, a) == 0.0)
  }

  test("mae matches manual computation") {
    assert(Metrics.mae(Array(1.0, 2.0), Array(2.0, 4.0)) == 1.5)
  }

  test("mae rejects length mismatch") {
    intercept[IllegalArgumentException](Metrics.mae(Array(1.0), Array(1.0, 2.0)))
  }

  test("seasonalNaiveScale of a perfectly periodic series is ~0 (floored)") {
    val m = 4
    val xs = Array.tabulate(40)(t => Seq(1.0, 2.0, 3.0, 4.0)(t % m))
    assert(Metrics.seasonalNaiveScale(xs, m) == 1e-12)
  }

  test("seasonalNaiveScale matches manual value") {
    val xs = Array(1.0, 2.0, 3.0, 5.0) // m=2: |3-1| + |5-2| over 2 terms
    assert(math.abs(Metrics.seasonalNaiveScale(xs, 2) - 2.5) < 1e-12)
  }

  test("seasonalNaiveScale rejects too-short series") {
    intercept[IllegalArgumentException](Metrics.seasonalNaiveScale(Array(1.0, 2.0), 2))
  }

  test("maseResidual is 0 for a perfect decomposition") {
    val m = 3
    val rng = new Random(1)
    val trend = Array.tabulate(30)(t => 0.1 * t)
    val seas = Array.tabulate(30)(t => math.sin(2 * math.Pi * t / m))
    val res = Array.fill(30)(0.0)
    val x = Array.tabulate(30)(t => trend(t) + seas(t) + res(t) + 0 * rng.nextDouble())
    val d = Decomposition(trend, Seq(seas), res)
    assert(Metrics.maseResidual(x, d, m) < 1e-9)
  }

  test("maseResidual of the all-zero decomposition equals MAE(x)/scale") {
    val xs = Array(2.0, -1.0, 3.0, 0.5, 2.5, -1.5)
    val m = 2
    val d = Decomposition(new Array[Double](6), Seq(new Array[Double](6)), xs.clone())
    val expected = xs.map(math.abs).sum / 6 / Metrics.seasonalNaiveScale(xs, m)
    assert(math.abs(Metrics.maseResidual(xs, d, m) - expected) < 1e-12)
  }

  test("maseVsTruth is scale invariant") {
    val rng = new Random(2)
    val n = 50; val m = 5
    val obs = Array.fill(n)(rng.nextGaussian() * 3 + 10)
    val est = Array.fill(n)(rng.nextGaussian())
    val tru = Array.fill(n)(rng.nextGaussian())
    val base = Metrics.maseVsTruth(est, tru, obs, m)
    val k = 7.3
    val scaled = Metrics.maseVsTruth(est.map(_ * k), tru.map(_ * k), obs.map(_ * k), m)
    assert(math.abs(base - scaled) < 1e-9)
  }

  test("trendSmoothness of a line is 0 (constant first difference)") {
    val line = Array.tabulate(20)(t => 3.0 + 2.0 * t)
    assert(Metrics.trendSmoothness(line) < 1e-12)
  }

  test("trendSmoothness of a noisy series exceeds that of its smooth version") {
    val rng = new Random(3)
    val smooth = Array.tabulate(100)(t => math.sin(t / 20.0))
    val noisy = smooth.map(_ + rng.nextGaussian() * 0.5)
    assert(Metrics.trendSmoothness(noisy) > Metrics.trendSmoothness(smooth))
  }

  test("trendSmoothness matches std of first differences by hand") {
    val xs = Array(0.0, 1.0, 3.0, 6.0) // diffs 1, 2, 3 -> std sqrt(2/3)
    assert(math.abs(Metrics.trendSmoothness(xs) - math.sqrt(2.0 / 3.0)) < 1e-12)
  }

  test("logTrendSmoothness is the natural log, floored at 1e-12") {
    val line = Array.tabulate(10)(t => 1.0 * t)
    assert(math.abs(Metrics.logTrendSmoothness(line) - math.log(1e-12)) < 1e-9)
    val xs = Array(0.0, 1.0, 3.0, 6.0)
    assert(math.abs(Metrics.logTrendSmoothness(xs) - math.log(math.sqrt(2.0 / 3.0))) < 1e-12)
  }

  test("trendSmoothness rejects too-short input") {
    intercept[IllegalArgumentException](Metrics.trendSmoothness(Array(1.0, 2.0)))
  }

  test("smoothness/residual trade-off: trend=data gives zero residual but rough trend") {
    // the paper's Figure-3 argument, as a property
    val rng = new Random(4)
    val m = 6
    val xs = Array.tabulate(60)(t => 0.2 * t + math.sin(2 * math.Pi * t / m) + rng.nextGaussian())
    val overfit = Decomposition(xs.clone(), Seq(new Array[Double](60)), new Array[Double](60))
    val underfit = Decomposition(Array.tabulate(60)(t => 0.2 * t),
      Seq(new Array[Double](60)),
      Array.tabulate(60)(t => xs(t) - 0.2 * t))
    assert(Metrics.maseResidual(xs, overfit, m) < Metrics.maseResidual(xs, underfit, m))
    assert(Metrics.trendSmoothness(overfit.trend) > Metrics.trendSmoothness(underfit.trend))
  }
}

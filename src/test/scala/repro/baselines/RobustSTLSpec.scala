package repro.baselines

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class RobustSTLSpec extends SparkSpec {

  private def series(n: Int, m: Int, slope: Double, amp: Double,
                     noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      3.0 + slope * t + amp * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * noise)
  }

  test("decomposition identity: X = T + S + R") {
    val xs = series(200, 10, 0.05, 3.0, 0.3, 1)
    val d = new RobustSTL().decompose(xs, Seq(10))
    for (i <- xs.indices)
      assert(math.abs(d.trend(i) + d.seasonals.head(i) + d.residual(i) - xs(i)) < 1e-9)
  }

  test("single-seasonality mode rejects multiple periods") {
    intercept[IllegalArgumentException](
      new RobustSTL().decompose(Array.fill(100)(1.0), Seq(5, 10)))
  }

  test("Fast variant (multiSeasonal) accepts multiple periods") {
    val rng = new Random(2)
    val xs = Array.tabulate(400)(t =>
      2.0 * math.sin(2 * math.Pi * t / 8) + 4.0 * math.sin(2 * math.Pi * t / 32) +
        0.02 * t + rng.nextGaussian() * 0.2)
    val d = new RobustSTL(multiSeasonal = true).decompose(xs, Seq(8, 32))
    assert(d.seasonals.size == 2)
    assert(Metrics.maseResidual(xs, d, 32) < 1.2)
  }

  test("bilateral denoise removes isolated spikes but keeps level") {
    val r = new RobustSTL()
    val xs = Array.fill(60)(5.0)
    xs(30) = 50.0 // spike
    val den = r.bilateralDenoise(xs)
    assert(math.abs(den(10) - 5.0) < 0.1)
    // the spike's neighbours must not be dragged up much (value-distance gate)
    assert(math.abs(den(29) - 5.0) < 1.0, s"neighbour polluted: ${den(29)}")
  }

  test("robust trend: recovers a piecewise-linear trend with a sharp change") {
    val r = new RobustSTL()
    val xs = Array.tabulate(200)(t => if (t < 100) 0.1 * t else 10.0 - 0.05 * (t - 100))
    val trend = r.robustTrend(xs)
    val mae = xs.indices.map(i => math.abs(trend(i) - xs(i))).sum / xs.length
    assert(mae < 1.0, s"trend MAE $mae")
  }

  test("robust trend resists outliers (L1 vs L2 behaviour)") {
    val r = new RobustSTL()
    val clean = Array.tabulate(150)(t => 0.1 * t)
    val dirty = clean.clone()
    dirty(50) = 100.0; dirty(100) = -100.0
    val trend = r.robustTrend(dirty)
    // trend at the outlier positions should stay near the clean line
    assert(math.abs(trend(50) - 5.0) < 2.0, s"outlier leaked: ${trend(50)}")
    assert(math.abs(trend(100) - 10.0) < 2.0, s"outlier leaked: ${trend(100)}")
  }

  test("non-local seasonal filter output is level-free (zero grand mean)") {
    val r = new RobustSTL()
    val m = 10
    val rng = new Random(3)
    val d = Array.tabulate(12 * m)(t => 3.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 0.2)
    val s = r.nonLocalSeasonal(d, m)
    assert(math.abs(s.sum / s.length) < 1e-9)
  }

  test("non-local seasonal filter recovers a stationary pattern") {
    val r = new RobustSTL()
    val m = 8
    val rng = new Random(4)
    val d = Array.tabulate(20 * m)(t => 4.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 0.3)
    val s = r.nonLocalSeasonal(d, m)
    val interior = (2 * m) until (d.length - 2 * m)
    val mae = interior.map(i => math.abs(s(i) - 4.0 * math.sin(2 * math.Pi * i / m))).sum / interior.size
    assert(mae < 0.8, s"seasonal MAE $mae")
  }

  test("full pipeline MASE beats seasonal naive on noisy data") {
    val m = 12
    val xs = series(20 * m, m, 0.03, 4.0, 0.5, 5)
    val d = new RobustSTL().decompose(xs, Seq(m))
    assert(Metrics.maseResidual(xs, d, m) < 1.0)
  }

  test("stays accurate in the presence of large outliers") {
    val m = 10
    val xs = series(20 * m, m, 0.05, 3.0, 0.2, 6)
    val dirty = xs.clone()
    for (i <- Seq(50, 90, 140)) dirty(i) += 30.0
    val d = new RobustSTL().decompose(dirty, Seq(m))
    // trend should not chase the outliers
    for (i <- Seq(50, 90, 140))
      assert(math.abs(d.trend(i) - (3.0 + 0.05 * i)) < 5.0, s"trend chased outlier at $i")
  }

  test("name reflects the variant") {
    assert(new RobustSTL().name == "RobustSTL")
    assert(new RobustSTL(multiSeasonal = true).name == "frobustSTL")
  }
}

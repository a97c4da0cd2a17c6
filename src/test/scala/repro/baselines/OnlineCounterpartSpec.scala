package repro.baselines

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class OnlineCounterpartSpec extends SparkSpec {

  private def series(n: Int, m: Int, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      5.0 + 0.05 * t + 3.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 0.3)
  }

  test("produces one decomposition value per input point") {
    val m = 10
    val xs = series(8 * m, m, 1)
    val d = new OnlineCounterpart(new BatchSTL()).decomposeAll(xs, Seq(m))
    assert(d.n == xs.length)
  }

  test("identity holds at every point") {
    val m = 8
    val xs = series(8 * m, m, 2)
    val d = new OnlineCounterpart(new BatchSTL()).decomposeAll(xs, Seq(m))
    for (i <- xs.indices)
      assert(math.abs(d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i) - xs(i)) < 1e-9)
  }

  test("online values after warm-up come from sliding-window re-runs (match manual run)") {
    val m = 6
    val xs = series(8 * m, m, 3)
    val algo = new BatchSTL()
    val wrapper = new OnlineCounterpart(algo)
    val d = wrapper.decomposeAll(xs, Seq(m))
    // manual check for the last point: decompose the last 4m window directly
    val win = xs.takeRight(4 * m)
    val manual = algo.decompose(win, Seq(m))
    assert(d.trend.last == manual.trend.last)
    assert(d.residual.last == manual.residual.last)
  }

  test("online MASE stays in the ballpark of offline MASE (paper §7.3 observation)") {
    val m = 12
    val xs = series(12 * m, m, 4)
    val offline = new BatchSTL().decompose(xs, Seq(m))
    val online = new OnlineCounterpart(new BatchSTL()).decomposeAll(xs, Seq(m))
    val offM = Metrics.maseResidual(xs, offline, m)
    val onM = Metrics.maseResidual(xs, online, m)
    assert(onM < 3 * offM + 0.5, s"online MASE $onM vs offline $offM")
  }

  test("secondsPerPoint returns a positive per-point latency") {
    val m = 10
    val xs = series(4 * m + 20, m, 5)
    val spp = new OnlineCounterpart(new BatchSTL()).secondsPerPoint(xs, Seq(m), steps = 3)
    assert(spp > 0.0 && spp < 10.0)
  }

  test("secondsPerPoint rejects series without enough points") {
    val m = 10
    intercept[IllegalArgumentException](
      new OnlineCounterpart(new BatchSTL()).secondsPerPoint(series(41, m, 6), Seq(m), steps = 5))
  }

  test("name is derived from the wrapped algorithm") {
    assert(new OnlineCounterpart(new BatchSTL()).name == "Online stl")
    assert(new OnlineCounterpart(new SSA()).name == "Online SSA")
  }

  test("works with every baseline on a short series") {
    val m = 8
    val xs = series(6 * m, m, 7)
    val algos: Seq[Decomposer] = Seq(
      new BatchSTL(), new MSTL(), new SSA(maxL = 40),
      new STR(), new TBATS(maxEvals = 15), new RobustSTL())
    for (algo <- algos) {
      val d = new OnlineCounterpart(algo).decomposeAll(xs, Seq(m))
      assert(d.n == xs.length, s"${algo.name} wrong length")
      assert(d.trend.forall(v => !v.isNaN), s"${algo.name} produced NaN trend")
    }
  }
}

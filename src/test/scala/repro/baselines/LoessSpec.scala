package repro.baselines

import repro.SparkSpec
import scala.util.Random

class LoessSpec extends SparkSpec {

  test("reproduces a constant series exactly") {
    val xs = Array.fill(30)(4.2)
    assert(Loess.smooth(xs, 7).forall(v => math.abs(v - 4.2) < 1e-9))
  }

  test("degree-1 loess reproduces a straight line exactly (incl. edges)") {
    val xs = Array.tabulate(50)(t => 2.0 + 0.5 * t)
    val out = Loess.smooth(xs, 11, degree = 1)
    for (i <- xs.indices)
      assert(math.abs(out(i) - xs(i)) < 1e-8, s"at $i: ${out(i)} vs ${xs(i)}")
  }

  test("degree-0 loess is a weighted mean: bounded by window extremes") {
    val rng = new Random(1)
    val xs = Array.fill(40)(rng.nextDouble() * 10)
    val out = Loess.smooth(xs, 9, degree = 0)
    assert(out.forall(v => v >= xs.min - 1e-9 && v <= xs.max + 1e-9))
  }

  test("smoothing reduces noise variance around a known signal") {
    val rng = new Random(2)
    val signal = Array.tabulate(200)(t => math.sin(t / 15.0))
    val noisy = signal.map(_ + rng.nextGaussian() * 0.3)
    val out = Loess.smooth(noisy, 21)
    def mse(a: Array[Double]) = a.zip(signal).map { case (x, s) => (x - s) * (x - s) }.sum
    assert(mse(out) < mse(noisy) / 2, "loess did not denoise")
  }

  test("jump > 1 approximates jump = 1 on smooth data") {
    val xs = Array.tabulate(120)(t => math.sin(t / 10.0) + 0.01 * t)
    val exact = Loess.smooth(xs, 15, jump = 1)
    val fast = Loess.smooth(xs, 15, jump = 5)
    val maxDiff = exact.zip(fast).map { case (a, b) => math.abs(a - b) }.max
    assert(maxDiff < 0.05, s"jump approximation too coarse: $maxDiff")
  }

  test("jump > 1 fits the last point (no dangling interpolation tail)") {
    val xs = Array.tabulate(53)(t => 0.3 * t)
    val out = Loess.smooth(xs, 9, jump = 7)
    assert(math.abs(out.last - xs.last) < 1e-8)
  }

  test("even span is promoted to odd; tiny spans clamped to 3") {
    val xs = Array.tabulate(20)(_.toDouble)
    // would throw or behave oddly if span handling were broken
    assert(Loess.smooth(xs, 2).length == 20)
    assert(Loess.smooth(xs, 8).length == 20)
  }

  test("empty input passes through") {
    assert(Loess.smooth(Array.empty[Double], 7).isEmpty)
  }

  test("span larger than series still works (global regression)") {
    val xs = Array.tabulate(10)(t => 1.0 + 2.0 * t)
    val out = Loess.smooth(xs, 99)
    for (i <- xs.indices) assert(math.abs(out(i) - xs(i)) < 1e-7)
  }
}

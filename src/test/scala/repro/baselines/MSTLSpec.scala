package repro.baselines

import repro.SparkSpec
import scala.util.Random

class MSTLSpec extends SparkSpec {

  private def dualSeasonal(n: Int, m1: Int, m2: Int, noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      10.0 + 0.02 * t + 2.0 * math.sin(2 * math.Pi * t / m1) +
        5.0 * math.sin(2 * math.Pi * t / m2) + rng.nextGaussian() * noise)
  }

  test("decomposition identity with two periods") {
    val xs = dualSeasonal(600, 6, 24, 0.3, 1)
    val d = new MSTL().decompose(xs, Seq(6, 24))
    for (i <- xs.indices) {
      val recon = d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i)
      assert(math.abs(recon - xs(i)) < 1e-9)
    }
  }

  test("single period reduces to classical STL behaviour") {
    val rng = new Random(2)
    val m = 12
    val xs = Array.tabulate(15 * m)(t =>
      3.0 * math.sin(2 * math.Pi * t / m) + 0.05 * t + rng.nextGaussian() * 0.2)
    val dm = new MSTL().decompose(xs, Seq(m))
    assert(dm.seasonals.size == 1)
    val interior = (2 * m) until (xs.length - 2 * m)
    val err = interior.map(i =>
      math.abs(dm.seasonals.head(i) - 3.0 * math.sin(2 * math.Pi * i / m))).max
    assert(err < 0.6, s"seasonal err $err")
  }

  test("separates both seasonal components (noise-free)") {
    val m1 = 6; val m2 = 30
    val xs = dualSeasonal(900, m1, m2, 0.0, 3)
    val d = new MSTL().decompose(xs, Seq(m1, m2))
    val interior = (2 * m2) until (xs.length - 2 * m2)
    val err1 = interior.map(i =>
      math.abs(d.seasonals(0)(i) - 2.0 * math.sin(2 * math.Pi * i / m1))).sum / interior.size
    val err2 = interior.map(i =>
      math.abs(d.seasonals(1)(i) - 5.0 * math.sin(2 * math.Pi * i / m2))).sum / interior.size
    assert(err1 < 0.5, s"short-period err $err1")
    assert(err2 < 1.0, s"long-period err $err2")
  }

  test("seasonals are returned in the caller's period order") {
    val xs = dualSeasonal(600, 6, 24, 0.1, 4)
    val d1 = new MSTL().decompose(xs, Seq(6, 24))
    val d2 = new MSTL().decompose(xs, Seq(24, 6))
    // same components, swapped positions
    val diff = d1.seasonals(0).zip(d2.seasonals(1)).map { case (a, b) => math.abs(a - b) }.max
    assert(diff < 1e-9)
  }

  test("residual is small for clean dual-seasonal data") {
    val xs = dualSeasonal(900, 8, 40, 0.0, 5)
    val d = new MSTL().decompose(xs, Seq(8, 40))
    val interior = (80 until xs.length - 80)
    val meanAbs = interior.map(i => math.abs(d.residual(i))).sum / interior.size
    assert(meanAbs < 0.5, s"mean |residual| $meanAbs")
  }
}

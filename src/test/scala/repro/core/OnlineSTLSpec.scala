package repro.core

import repro.SparkSpec
import repro.metrics.Metrics
import scala.util.Random

class OnlineSTLSpec extends SparkSpec {

  private def seasonalSeries(n: Int, m: Int, trendSlope: Double,
                             amp: Double, noise: Double, seed: Int): Array[Double] = {
    val rng = new Random(seed)
    Array.tabulate(n)(t =>
      10.0 + trendSlope * t + amp * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * noise)
  }

  test("constructor validates periods and gamma") {
    intercept[IllegalArgumentException](new OnlineSTL(Seq.empty))
    intercept[IllegalArgumentException](new OnlineSTL(Seq(1)))
    intercept[IllegalArgumentException](new OnlineSTL(Seq(7, 7)))
    intercept[IllegalArgumentException](new OnlineSTL(Seq(7), gamma = 0.0))
    intercept[IllegalArgumentException](new OnlineSTL(Seq(7), gamma = 1.5))
  }

  test("m is the maximum seasonality") {
    assert(new OnlineSTL(Seq(7, 28)).m == 28)
    assert(new OnlineSTL(Seq(24)).m == 24)
  }

  test("no emissions until the 4m-th point; then the whole backlog at once") {
    val m = 6
    val stl = new OnlineSTL(Seq(m))
    val xs = seasonalSeries(4 * m + 5, m, 0.01, 2.0, 0.0, 1)
    var emitted = 0
    for (i <- 0 until 4 * m - 1) {
      val out = stl.push(xs(i))
      assert(out.isEmpty, s"unexpected emission at point $i")
      assert(!stl.isReady)
    }
    val burst = stl.push(xs(4 * m - 1))
    assert(burst.size == 4 * m, s"init burst should emit 4m points, got ${burst.size}")
    assert(stl.isReady)
    emitted = burst.size
    for (i <- 4 * m until xs.length) {
      val out = stl.push(xs(i))
      assert(out.size == 1)
      emitted += 1
    }
    assert(emitted == xs.length)
  }

  test("emitted indices are sequential from 0") {
    val m = 5
    val stl = new OnlineSTL(Seq(m))
    val xs = seasonalSeries(4 * m + 10, m, 0.0, 1.0, 0.0, 2)
    val pts = xs.flatMap(stl.push)
    assert(pts.map(_.index).toSeq == (0 until xs.length).map(_.toLong))
  }

  test("decomposition identity holds exactly: X = T + sum(S) + R") {
    val m = 8
    val xs = seasonalSeries(4 * m + 50, m, 0.05, 3.0, 0.5, 3)
    val d = OnlineSTL.decompose(xs, Seq(m))
    for (i <- xs.indices) {
      val recon = d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i)
      assert(math.abs(recon - xs(i)) < 1e-9, s"identity violated at $i")
    }
  }

  test("recovers a linear trend with small relative error (noise-free)") {
    val m = 12
    val n = 4 * m + 20 * m
    val xs = Array.tabulate(n)(t => 5.0 + 0.1 * t + 2.0 * math.sin(2 * math.Pi * t / m))
    val d = OnlineSTL.decompose(xs, Seq(m))
    // after warm-up, trend should track 5 + 0.1t closely (lag of a few steps)
    val tail = (n / 2) until n
    val err = tail.map(i => math.abs(d.trend(i) - (5.0 + 0.1 * i))).max
    assert(err < 0.1 * m, s"max trend error $err too large")
  }

  test("recovers a stationary seasonal pattern (noise-free): residual near zero") {
    val m = 10
    val n = 4 * m + 30 * m
    val xs = Array.tabulate(n)(t => 20.0 + 4.0 * math.sin(2 * math.Pi * t / m))
    val d = OnlineSTL.decompose(xs, Seq(m))
    // the non-symmetric trend filter keeps a small systematic lag bias, so the
    // bound is loose relative to the 4.0 amplitude
    val tailRes = (n - 10 * m until n).map(i => math.abs(d.residual(i)))
    assert(tailRes.sum / tailRes.size < 0.6, s"mean |residual| ${tailRes.sum / tailRes.size}")
  }

  test("seasonal estimates repeat with the period once converged") {
    val m = 7
    val n = 4 * m + 40 * m
    val xs = Array.tabulate(n)(t => 3.0 * math.cos(2 * math.Pi * t / m) + 1.0)
    val d = OnlineSTL.decompose(xs, Seq(m))
    for (i <- (n - 2 * m) until (n - m))
      assert(math.abs(d.seasonals(0)(i) - d.seasonals(0)(i + m)) < 0.15,
        s"seasonality not periodic at $i")
  }

  test("multiple seasonalities: both components extracted") {
    val m1 = 6; val m2 = 24
    val n = 4 * m2 + 40 * m2
    val xs = Array.tabulate(n)(t =>
      2.0 * math.sin(2 * math.Pi * t / m1) + 5.0 * math.sin(2 * math.Pi * t / m2) + 50.0)
    val d = OnlineSTL.decompose(xs, Seq(m1, m2))
    assert(d.seasonals.size == 2)
    // each component should carry non-trivial signal at its own period
    val tail = (n - 10 * m2) until n
    val amp1 = tail.map(i => math.abs(d.seasonals(0)(i))).max
    val amp2 = tail.map(i => math.abs(d.seasonals(1)(i))).max
    assert(amp1 > 0.8, s"short-period component too weak: $amp1")
    assert(amp2 > 2.0, s"long-period component too weak: $amp2")
    // residual after removing both should be small relative to signal
    val meanRes = tail.map(i => math.abs(d.residual(i))).sum / tail.size
    assert(meanRes < 1.2, s"mean residual $meanRes")
  }

  test("adapts to a seasonality amplitude shift (online property)") {
    val m = 10
    val n1 = 4 * m + 30 * m
    val n2 = 30 * m
    val xs = Array.tabulate(n1 + n2) { t =>
      val amp = if (t < n1) 2.0 else 6.0
      amp * math.sin(2 * math.Pi * t / m)
    }
    val d = OnlineSTL.decompose(xs, Seq(m))
    val lateAmp = ((n1 + n2 - 5 * m) until (n1 + n2)).map(i => math.abs(d.seasonals(0)(i))).max
    assert(lateAmp > 4.0, s"did not adapt to new amplitude: $lateAmp")
  }

  test("decomposeAll rejects series shorter than 4m") {
    val stl = new OnlineSTL(Seq(10))
    intercept[IllegalArgumentException](stl.decomposeAll(Array.fill(39)(1.0)))
  }

  test("state space is O(4m): serialized size independent of points seen") {
    val m = 20
    def sizeAfter(points: Int): Int = {
      val stl = new OnlineSTL(Seq(m))
      val xs = seasonalSeries(points, m, 0.01, 1.0, 0.1, 4)
      xs.foreach(stl.push)
      val bos = new java.io.ByteArrayOutputStream()
      new java.io.ObjectOutputStream(bos).writeObject(stl)
      bos.size()
    }
    val s1 = sizeAfter(4 * m + 10)
    val s2 = sizeAfter(4 * m + 5000)
    assert(math.abs(s1 - s2) < 1000, s"state grew with stream length: $s1 vs $s2")
  }

  test("serialized state resumes identically (streaming checkpoint semantics)") {
    val m = 6
    val xs = seasonalSeries(4 * m + 60, m, 0.02, 2.0, 0.3, 5)
    val stl = new OnlineSTL(Seq(m))
    xs.take(4 * m + 30).foreach(stl.push)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(stl)
    val copy = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[OnlineSTL]
    for (i <- 4 * m + 30 until xs.length) {
      val a = stl.push(xs(i)).head
      val b = copy.push(xs(i)).head
      assert(a.trend == b.trend && a.residual == b.residual)
      assert(a.seasonals.toSeq == b.seasonals.toSeq)
    }
  }

  test("gamma extremes still produce valid decompositions") {
    val m = 8
    val xs = seasonalSeries(4 * m + 40, m, 0.0, 2.0, 0.2, 6)
    for (g <- Seq(0.01, 0.5, 1.0)) {
      val d = OnlineSTL.decompose(xs.clone(), Seq(m), gamma = g)
      assert(d.n == xs.length)
      for (i <- xs.indices)
        assert(math.abs(d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i) - xs(i)) < 1e-9)
    }
  }

  test("beats the seasonal-naive baseline on MASE for a clean seasonal series") {
    val m = 14
    val n = 4 * m + 40 * m
    val rng = new Random(9)
    val xs = Array.tabulate(n)(t =>
      0.02 * t + 3.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 0.3)
    val d = OnlineSTL.decompose(xs, Seq(m))
    val mase = Metrics.maseResidual(xs, d, m)
    assert(mase < 1.0, s"MASE $mase should beat seasonal naive (1.0)")
  }

  test("trend is smoother than the raw series") {
    val m = 10
    val rng = new Random(10)
    val xs = Array.tabulate(4 * m + 60 * m)(t =>
      0.01 * t + 2.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 1.0)
    val d = OnlineSTL.decompose(xs, Seq(m))
    assert(Metrics.trendSmoothness(d.trend) < Metrics.trendSmoothness(xs))
  }

  for (m <- Seq(4, 12, 30)) {
    test(s"period m=$m: per-point emission after init, identity holds") {
      val rng = new Random(m)
      val stl = new OnlineSTL(Seq(m))
      var i = 0
      val n = 4 * m + 3 * m
      while (i < n) {
        val x = math.sin(2 * math.Pi * i / m) + rng.nextGaussian() * 0.1
        val out = stl.push(x)
        out.foreach { p =>
          assert(math.abs(p.trend + p.seasonalSum + p.residual - p.value) < 1e-9)
        }
        i += 1
      }
      assert(stl.pointsSeen == n)
    }
  }
}

package repro.baselines

import repro.SparkSpec
import scala.util.Random

class SSASpec extends SparkSpec {

  test("decomposition identity: X = T + sum(S) + R") {
    val rng = new Random(1)
    val m = 12
    val xs = Array.tabulate(20 * m)(t =>
      10.0 + 0.05 * t + 3.0 * math.sin(2 * math.Pi * t / m) + rng.nextGaussian() * 0.3)
    val d = new SSA().decompose(xs, Seq(m))
    for (i <- xs.indices) {
      val recon = d.trend(i) + d.seasonals.map(_(i)).sum + d.residual(i)
      assert(math.abs(recon - xs(i)) < 1e-9)
    }
  }

  test("captures a pure trend: trend component carries most of the signal") {
    val xs = Array.tabulate(200)(t => 2.0 + 0.5 * t)
    val d = new SSA().decompose(xs, Seq(10))
    val err = xs.indices.map(i => math.abs(d.trend(i) - xs(i))).sum / xs.length
    assert(err < 0.1 * xs.map(math.abs).max, s"trend MAE $err")
  }

  test("captures a pure sinusoid into the seasonal component") {
    val m = 20
    val xs = Array.tabulate(15 * m)(t => 5.0 * math.sin(2 * math.Pi * t / m))
    val d = new SSA().decompose(xs, Seq(m))
    val interior = m until (xs.length - m)
    val seasErr = interior.map(i => math.abs(d.seasonals.head(i) - xs(i))).sum / interior.size
    assert(seasErr < 1.0, s"seasonal MAE $seasErr")
  }

  test("trend + seasonal mixture: components roughly separated (noise-free)") {
    val m = 16
    val xs = Array.tabulate(20 * m)(t => 0.1 * t + 4.0 * math.sin(2 * math.Pi * t / m))
    val d = new SSA().decompose(xs, Seq(m))
    val interior = (2 * m) until (xs.length - 2 * m)
    val trendErr = interior.map(i => math.abs(d.trend(i) - 0.1 * i)).sum / interior.size
    assert(trendErr < 2.0, s"trend MAE $trendErr")
  }

  test("embedding length respects the maxL cap") {
    val rng = new Random(2)
    val xs = Array.fill(4000)(rng.nextGaussian())
    // would take minutes without the cap; finishing fast implies cap applied
    val t0 = System.nanoTime()
    new SSA(maxL = 60, maxComps = 6).decompose(xs, Seq(500))
    val sec = (System.nanoTime() - t0) / 1e9
    assert(sec < 30, s"capped SSA took ${sec}s")
  }

  test("groupOf classifies a slow eigenvector as trend") {
    val ssa = new SSA()
    val u = Array.tabulate(100)(i => 1.0 + 0.001 * i) // no sign changes
    assert(ssa.groupOf(u, Seq(10)) == Some(-1))
  }

  test("groupOf classifies an m-periodic eigenvector as seasonal") {
    val ssa = new SSA()
    val m = 10
    val u = Array.tabulate(100)(i => math.sin(2 * math.Pi * i / m))
    assert(ssa.groupOf(u, Seq(m)) == Some(0))
  }

  test("groupOf sends fast off-harmonic oscillation to residual") {
    val ssa = new SSA()
    val u = Array.tabulate(100)(i => if (i % 2 == 0) 1.0 else -1.0) // freq 0.5
    // with period 7, harmonics j/7 (j<=4) max 0.571>0.5... use period 12: harmonics .083 .167 .25 .333
    assert(ssa.groupOf(u, Seq(12)).isEmpty)
  }

  test("rejects a series too short to embed") {
    intercept[IllegalArgumentException](new SSA().decompose(Array(1.0), Seq(2000)))
  }
}

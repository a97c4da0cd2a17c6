package repro.bench

import repro.SparkSpec
import repro.exp.Table1

/** Bench for paper Table 1: single-node throughput at daily seasonality on
  * minutely data (m = 1440), OnlineSTL vs online counterparts of every batch
  * algorithm. Prints measured rows next to the paper's throughput classes;
  * assertions check the *shape* (ordering and ~100x gap), not absolute
  * numbers, per EXPERIMENTS.md.
  */
class Table1ThroughputBench extends SparkSpec {

  test("Table 1: throughput at seasonality 1440 — OnlineSTL ~100x faster") {
    val rows = Table1.run(seasonality = 1440, onlineSTLPoints = 30000,
      stepsFast = 5, stepsSlow = 2)
    println("\n== Table 1 (measured vs paper class), seasonality = 1440 ==")
    println(Table1.format(rows))

    val byName = rows.map(r => r.algorithm -> r.throughputPerSec).toMap
    val online = byName("OnlineSTL")
    // OnlineSTL is the fastest algorithm
    assert(rows.head.algorithm == "OnlineSTL", s"fastest was ${rows.head.algorithm}")
    // and is >= 50x faster than every optimization/model-based baseline
    for (slow <- Seq("TBATS", "STR", "SSA", "RobustSTL", "frobustSTL"))
      assert(online / byName(slow) > 50,
        s"OnlineSTL only ${online / byName(slow)}x faster than $slow")
    // classical STL is the best batch baseline (paper: "second fastest")
    val batchBest = rows.filter(_.algorithm != "OnlineSTL").head.algorithm
    assert(Set("stl", "MSTL").contains(batchBest), s"best batch was $batchBest")
    // OnlineSTL clears the paper's O(10,000)/s class on this hardware
    assert(online > 10000, s"OnlineSTL throughput $online below 10K/s")
  }

  test("Table 1 (supplementary): throughput ordering also holds at seasonality 100") {
    val rows = Table1.run(seasonality = 100, onlineSTLPoints = 30000,
      stepsFast = 10, stepsSlow = 3)
    println("\n== Table 1 supplementary, seasonality = 100 ==")
    println(Table1.format(rows))
    assert(rows.head.algorithm == "OnlineSTL")
    val byName = rows.map(r => r.algorithm -> r.throughputPerSec).toMap
    assert(byName("OnlineSTL") / byName("TBATS") > 20)
  }
}

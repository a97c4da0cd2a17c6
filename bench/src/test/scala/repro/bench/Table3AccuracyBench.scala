package repro.bench

import repro.SparkSpec
import repro.exp.Table3

/** Bench for paper Table 3: decomposition quality (MASE of residual, log
  * trend smoothness) on the five real-dataset stand-ins, offline + online
  * variant of every baseline vs OnlineSTL. Assertions check the paper's
  * qualitative claims: OnlineSTL is competitive (never catastrophically
  * worse) and lands in the upper half on most datasets.
  */
class Table3AccuracyBench extends SparkSpec {

  test("Table 3: accuracy over the five real datasets") {
    val rows = Table3.run()
    println("\n== Table 3 (measured; paper values alongside) ==")
    println(Table3.format(rows))

    val datasets = rows.map(_.dataset).distinct
    assert(datasets.size == 5)
    for (ds <- datasets) {
      val dsRows = rows.filter(_.dataset == ds)
      val ostl = dsRows.find(_.algorithm == "OnlineSTL").get.online.get
      // all MASE values finite and positive
      for (r <- dsRows; c <- r.offline.toSeq ++ r.online.toSeq) {
        assert(!c.mase.isNaN && c.mase >= 0, s"$ds/${r.algorithm} bad MASE")
        assert(!c.logSmooth.isNaN, s"$ds/${r.algorithm} bad smoothness")
      }
      // paper claim: OnlineSTL decomposes meaningfully (beats seasonal naive)
      assert(ostl.mase < 1.0, s"$ds: OnlineSTL MASE ${ostl.mase} >= seasonal naive")
      // paper claim: OnlineSTL ranks in the top half by MASE across all
      // offline+online variants on most datasets (paper: all but one).
    }
    val topHalfCount = datasets.count { ds =>
      val dsRows = rows.filter(_.dataset == ds)
      val all = dsRows.flatMap(r => (r.offline.toSeq ++ r.online.toSeq).map(c => (r.algorithm, c.mase)))
      val ostl = dsRows.find(_.algorithm == "OnlineSTL").get.online.get.mase
      val rank = all.count(_._2 < ostl)
      rank <= all.size / 2
    }
    assert(topHalfCount >= 3, s"OnlineSTL in top half on only $topHalfCount/5 datasets")
  }
}

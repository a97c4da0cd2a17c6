package repro.jobs

import repro.exp.Table1

/** spark-submit entrypoint for Table 1 (single-node throughput comparison).
  * Args: [seasonality] [onlineSTLPoints] — defaults 1440, 50000.
  * Runs on the driver only (the experiment is explicitly single-node, §7.2).
  */
object Table1Throughput {
  def main(args: Array[String]): Unit = {
    val seasonality = args.headOption.map(_.toInt).getOrElse(1440)
    val points = args.lift(1).map(_.toInt).getOrElse(50000)
    val rows = Table1.run(seasonality, points)
    println(s"== Table 1: throughput at seasonality $seasonality ==")
    println(Table1.format(rows))
  }
}

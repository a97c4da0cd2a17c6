package repro.jobs

import repro.exp.Table4

/** spark-submit entrypoint for Table 4 (MASE vs true components on the
  * Figure-4 synthetic series). Pure driver-side compute.
  */
object Table4SyntheticAccuracy {
  def main(args: Array[String]): Unit = {
    val rows = Table4.run()
    println("== Table 4: synthetic-data accuracy vs truth ==")
    println(Table4.format(rows))
  }
}

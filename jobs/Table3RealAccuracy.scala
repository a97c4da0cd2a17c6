package repro.jobs

import repro.exp.Table3

/** spark-submit entrypoint for Table 3 (accuracy on the five real-dataset
  * stand-ins, offline + online variants). Pure driver-side compute.
  */
object Table3RealAccuracy {
  def main(args: Array[String]): Unit = {
    val rows = Table3.run()
    println("== Table 3: accuracy on real datasets (stand-ins) ==")
    println(Table3.format(rows))
  }
}

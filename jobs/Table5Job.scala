package repro.jobs

import repro.exp.{Table5, Workloads}

/** spark-submit entrypoint reproducing Table 5 (accuracy).
  * Usage: Table5Job [nHospitals] [rowsPerHospital]
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = Workloads.newSpark("daisy-table5")
    val nH = args.lift(0).map(_.toInt).getOrElse(125)
    val rp = args.lift(1).map(_.toInt).getOrElse(8)
    val rows = Table5.run(spark, nH, rp)
    println("=== Table 5: Accuracy (measured vs paper) ===")
    println(Table5.render(rows))
    spark.stop()
  }
}

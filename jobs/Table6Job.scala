package repro.jobs

import repro.exp.{Table6, Workloads}

/** spark-submit entrypoint reproducing Table 6 (response time vs number
  * of rules). Usage: Table6Job [nHospitals] [rowsPerHospital]
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = Workloads.newSpark("daisy-table6")
    val nH = args.lift(0).map(_.toInt).getOrElse(4000)
    val rp = args.lift(1).map(_.toInt).getOrElse(25)
    val rows = Table6.run(spark, nH, rp)
    println("=== Table 6: Response time, increasing number of rules ===")
    println(Table6.render(rows))
    spark.stop()
  }
}

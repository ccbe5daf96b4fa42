package repro.jobs

import repro.exp.{Table7, Workloads}

/** spark-submit entrypoint reproducing Table 7 (incremental rule
  * arrival / provenance benefit). Usage: Table7Job [nHospitals] [rowsPer]
  */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = Workloads.newSpark("daisy-table7")
    val nH = args.lift(0).map(_.toInt).getOrElse(4000)
    val rp = args.lift(1).map(_.toInt).getOrElse(25)
    val rows = Table7.run(spark, nH, rp)
    println("=== Table 7: Incremental rules via provenance ===")
    println(Table7.render(rows))
    spark.stop()
  }
}

package repro.jobs

import repro.exp.{Table8, Workloads}

/** spark-submit entrypoint reproducing Table 8 (realistic scenarios).
  * Usage: Table8Job [offlineTimeoutSec]
  */
object Table8Job {
  def main(args: Array[String]): Unit = {
    val spark = Workloads.newSpark("daisy-table8")
    val timeout = args.lift(0).map(_.toDouble).getOrElse(300.0)
    val rows = Table8.run(spark, Table8.Sizes(offlineTimeoutSec = timeout))
    println("=== Table 8: Realistic exploratory scenarios ===")
    println(Table8.render(rows))
    spark.stop()
  }
}

package repro

import org.apache.spark.sql.functions._
import repro.core.ProbData.MaterializeOps

/** Diagnostic: does localCheckpoint propagate (and compound) the
  * parent plan's size-in-bytes statistics across generations?
  */
object StatsProbe {
  def main(args: Array[String]): Unit = {
    val spark = SparkSpec.shared
    var df = spark.range(100).toDF("k").materialized
    for (gen <- 1 to 8) {
      val other = df.groupBy("k").count().withColumnRenamed("k", "k2")
      df = df.join(other, col("k") === col("k2")).drop("k2", "count")
        .join(other.withColumnRenamed("k2", "k3"), col("k") === col("k3")).drop("k3", "count")
        .materialized
      val s = df.queryExecution.optimizedPlan.stats.sizeInBytes
      println(s"gen=$gen sizeInBytes digits=${s.toString.length}")
    }
    spark.stop()
  }
}

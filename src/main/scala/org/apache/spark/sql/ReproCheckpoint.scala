package org.apache.spark.sql

/** Stats-free eager materialization.
  *
  * `Dataset.localCheckpoint` in Spark 4 bakes the parent plan's
  * *estimated* statistics into the resulting `LogicalRDD`
  * (`LogicalRDD.rewriteStatsAndConstraints`). Size-in-bytes estimation
  * multiplies across (outer-)join children, and Daisy's state update
  * joins the state against several frames derived from the state
  * itself — so the baked estimate grows geometrically with every
  * checkpoint generation, until Catalyst spends minutes multiplying
  * million-digit BigIntegers during planning.
  *
  * This helper materializes eagerly like `localCheckpoint(true)` but
  * rebuilds the DataFrame directly from the checkpointed internal-row
  * RDD, dropping the inherited statistics (the leaf then reports the
  * session's `spark.sql.defaultSizeInBytes`). It lives in the
  * `org.apache.spark.sql` package to reach the `private[sql]`
  * `internalCreateDataFrame`.
  */
object ReproCheckpoint {
  def statsFree(df: Dataset[Row]): Dataset[Row] = {
    val classicDf = df.asInstanceOf[classic.Dataset[Row]]
    val ck = classicDf.localCheckpoint(true).asInstanceOf[classic.Dataset[Row]]
    ck.sparkSession.internalCreateDataFrame(ck.queryExecution.toRdd, ck.schema)
  }
}

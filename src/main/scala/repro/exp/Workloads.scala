package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._

/** Shared helpers for the evaluation workloads (§7). */
object Workloads {

  /** Wall-clock of `f` in seconds. */
  def timed[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** The 4-query whole-dataset SP workload of the hospital experiments
    * (§7.3: "a workload of 4 SP queries that access the whole dataset;
    * each tuple is accessed only once"). Hospital rows partition by
    * `hospital_type` (4 values); the select list touches the rule
    * attributes so every rule overlaps the query.
    */
  def hospitalWorkload(ruleAttrs: Seq[String]): Seq[QuerySpec] =
    (0 until 4).map { t =>
      QuerySpec("hospital",
        where = Seq(Pred("hospital_type", "=", s"type_$t")),
        select = (ruleAttrs ++ Seq("provider_id")).distinct)
    }

  /** Runs a workload through a Daisy session, forcing each result, and
    * returns the total wall time in seconds.
    */
  def runWorkload(daisy: Daisy, queries: Seq[QuerySpec]): Double = {
    val (_, secs) = timed { queries.foreach(q => daisy.execute(q)) }
    secs
  }

  /** The 37-query Nestle exploration (§7.3): repeated SP lookups of
    * coffee-like categories covering ~40% of the dataset
    * (6 of 15 categories).
    */
  def nestleWorkload(nCategories: Int = 15): Seq[QuerySpec] = {
    val coffee = Seq(0, 2, 4, 6, 8, 10).map(i => i % nCategories)
    (0 until 37).map { i =>
      QuerySpec("nestle",
        where = Seq(Pred("category", "=", s"cat_${coffee(i % coffee.size)}")),
        select = Seq("product_name", "material", "category"))
    }
  }

  /** The 52-query air-quality analysis (§7.3): per-county average CO
    * grouped by year, one county per query.
    */
  def airQualityWorkload(nCounties: Int): Seq[QuerySpec] =
    (0 until 52).map { i =>
      val c = (i.toLong * nCounties / 52) % nCounties
      QuerySpec("air",
        where = Seq(Pred("county_code", "=", s"cc_$c"),
          Pred("state_code", "=", s"st_${c % 50}")),
        groupBy = Seq("year"),
        aggs = Seq(Agg("avg", "co", "avg_co")))
    }

  def newSpark(app: String): SparkSession =
    SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.defaultSizeInBytes", 10L * 1024 * 1024)
      .config("spark.sql.adaptive.enabled", "false")
      .getOrCreate()
}

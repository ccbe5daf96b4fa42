package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** Shared fixtures: the worked examples of the paper. */
object TestData {

  /** Table 2a — the dirty Cities dataset (Zip → City). */
  def cities(spark: SparkSession): DataFrame = {
    val rows = Seq(
      (0L, "9001", "Los Angeles"),
      (1L, "9001", "San Francisco"),
      (2L, "9001", "Los Angeles"),
      (3L, "10001", "San Francisco"),
      (4L, "10001", "New York"),
    )
    spark.createDataFrame(rows).toDF("__tid", "zip", "city")
  }

  val cityFd: Fd = Fd("fd_zip_city", "zip", "city")

  /** Table 4a — Cities for the join example (§4.4, Example 6). */
  def citiesJoin(spark: SparkSession): DataFrame =
    spark.createDataFrame(Seq(
      (0L, "9001", "Los Angeles"),
      (1L, "9001", "San Francisco"),
      (2L, "10001", "San Francisco"),
    )).toDF("__tid", "zip", "city")

  /** Table 4b — Employee (Phone → Zip). */
  def employees(spark: SparkSession): DataFrame =
    spark.createDataFrame(Seq(
      (0L, "10002", "Jon", "12345"),
      (1L, "10001", "Mary", "12345"),
      (2L, "9001", "Peter", "23456"),
    )).toDF("__tid", "ezip", "ename", "phone")

  val empFd: Fd = Fd("fd_phone_zip", "phone", "ezip")

  /** Example 5 — salary/tax/age tuples. */
  def salaries(spark: SparkSession): DataFrame =
    spark.createDataFrame(Seq(
      (1L, 1000.0, 0.1, 31),
      (2L, 3000.0, 0.2, 32),
      (3L, 2000.0, 0.3, 43),
    )).toDF("__tid", "salary", "tax", "age")

  val salaryDc: InequalityDc =
    InequalityDc("dc_sal_tax", Seq(Atom("salary", "<"), Atom("tax", ">")))

  val salaryAgeDc: InequalityDc = InequalityDc("dc_sal_age_tax",
    Seq(Atom("salary", "<"), Atom("age", "<"), Atom("tax", ">")))

  /** Candidate sets of a state row as a comparable canonical value:
    * attr -> Seq((value-or-bound, op, rounded p)).
    */
  def candsOf(state: DataFrame, attr: String): Map[Long, Seq[(String, String, Double)]] = {
    import org.apache.spark.sql.functions._
    state.select(col(ProbData.TidCol), col(ProbData.candCol(attr)))
      .collect()
      .map { r =>
        val tid = r.getLong(0)
        val cands = Option(r.getSeq[Row](1)).getOrElse(Seq.empty)
          .map(c => (c.getString(0), c.getString(1), math.rint(c.getDouble(2) * 100) / 100))
          .sortBy(c => (c._1, c._2))
        tid -> cands
      }.toMap
  }

  /** tids of `df` as a sorted list. */
  def tids(df: DataFrame): Seq[Long] = {
    import org.apache.spark.sql.functions._
    df.select(col(df.columns.head)).collect().map(_.getLong(0)).toSeq.sorted
  }
}

package repro.offline

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core._
import repro.data.SSB

/** Offline comparator: bulk and per-group modes must agree. */
class OfflineCleanerSpec extends SparkSpec {

  private val fd = TestData.cityFd

  private def canon(state: DataFrame, attrs: Seq[String]): Seq[String] =
    attrs.foldLeft(state)((df, a) => df.withColumn(a + "_v", ProbData.candsToString(a)))
      .select((Seq("__tid") ++ attrs.map(_ + "_v")).map(col): _*)
      .collect().map(_.toSeq.mkString("|")).sorted.toSeq

  test("bulk mode produces the Table 2b probabilistic dataset") {
    val res = OfflineCleaner.run(TestData.cities(spark), Seq(fd))
    val city = TestData.candsOf(res.state, "city")
    assert(city(0L) == Seq(("Los Angeles", "=", 0.67), ("San Francisco", "=", 0.33)))
    assert(city(3L) == Seq(("New York", "=", 0.5), ("San Francisco", "=", 0.5)))
    assert(!res.timedOut)
  }

  test("per-group mode equals bulk mode on the cities fixture") {
    val bulk = OfflineCleaner.run(TestData.cities(spark), Seq(fd), OfflineCleaner.Mode.Bulk)
    val perG = OfflineCleaner.run(TestData.cities(spark), Seq(fd), OfflineCleaner.Mode.PerGroup)
    assert(canon(bulk.state, Seq("zip", "city")) == canon(perG.state, Seq("zip", "city")))
    assert(perG.groupsProcessed == 2)
  }

  test("per-group mode equals bulk mode on generated SSB data") {
    val data = SSB.lineorder(spark, 600, 30, 8)
    val bulk = OfflineCleaner.run(data.dirty, Seq(SSB.Phi), OfflineCleaner.Mode.Bulk)
    val perG = OfflineCleaner.run(data.dirty, Seq(SSB.Phi), OfflineCleaner.Mode.PerGroup)
    assert(canon(bulk.state, Seq("orderkey", "suppkey")) ==
      canon(perG.state, Seq("orderkey", "suppkey")))
  }

  test("timeout aborts the per-group loop and reports partial progress") {
    val data = SSB.lineorder(spark, 2000, 200, 20)
    val res = OfflineCleaner.run(data.dirty, Seq(SSB.Phi),
      OfflineCleaner.Mode.PerGroup, timeoutSec = 0.0)
    assert(res.timedOut)
    assert(res.groupsProcessed < res.groupsTotal || res.groupsTotal == 0)
  }

  test("multiple rules are applied sequentially and merged") {
    val df = spark.createDataFrame(Seq(
      (0L, "9001", "LA", "hospA"), (1L, "9001", "SF", "hospA"),
      (2L, "10001", "NY", "hospB"), (3L, "10002", "NY", "hospB")))
      .toDF("__tid", "zip", "city", "name")
    val phi2 = Fd("phi2", "name", "zip")
    val res = OfflineCleaner.run(df, Seq(fd, phi2))
    // φ1 gives city candidates in group 9001; φ2 gives zip candidates
    // for hospB (two zips for one name).
    assert(TestData.candsOf(res.state, "city")(0L).nonEmpty)
    assert(TestData.candsOf(res.state, "zip")(2L).map(c => (c._1, c._2)) ==
      Seq(("10001", "="), ("10002", "=")))
  }

  test("DC rule: offline full theta-join repairs Example 5") {
    val res = OfflineCleaner.run(TestData.salaries(spark), Seq(TestData.salaryDc))
    val sal = TestData.candsOf(res.state, "salary")
    assert(sal(2L) == Seq(("2000.0", "<", 0.5), ("3000.0", "=", 0.5)))
  }

  test("clean input passes through untouched") {
    val df = spark.createDataFrame(Seq((0L, "1", "a"), (1L, "2", "b")))
      .toDF("__tid", "zip", "city")
    val res = OfflineCleaner.run(df, Seq(fd))
    assert(res.state.filter(ProbData.isDirty("city")).count() == 0)
    assert(res.groupsTotal == 0)
  }
}

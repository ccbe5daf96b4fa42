package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.SSB
import repro.offline.OfflineCleaner

/** End-to-end Daisy sessions (§6): query-driven gradual cleaning. */
class DaisySpec extends SparkSpec {

  private val fd = TestData.cityFd

  private def freshDaisy(opts: DaisyOptions = DaisyOptions()) =
    Daisy.single(spark, "cities", TestData.cities(spark), Seq(fd), opts)

  // Canonical probabilistic view for state comparisons.
  private def canon(state: DataFrame, attrs: Seq[String]): Seq[String] =
    attrs.foldLeft(state)((df, a) => df.withColumn(a + "_v", ProbData.candsToString(a)))
      .select((Seq("__tid") ++ attrs.map(_ + "_v")).map(col): _*)
      .collect().map(_.toSeq.mkString("|")).sorted.toSeq

  test("a query on a clean attribute of a dirty table returns the dirty rows (oracle)") {
    val d = Daisy.single(spark, "t",
      spark.createDataFrame(Seq((0L, "1", "a", "x"), (1L, "1", "b", "y")))
        .toDF("__tid", "zip", "city", "other"),
      Seq(fd))
    val res = d.execute(QuerySpec("t", where = Seq(Pred("other", "=", "x")),
      select = Seq("other")))
    Oracle.assertEquivalent(res.select("other"),
      "SELECT other FROM t WHERE other = 'x'",
      "t" -> spark.createDataFrame(Seq(("x")).map(Tuple1(_))).toDF("other"))
    assert(d.lastReport.plan.steps.isEmpty)
  }

  test("SP query with rhs filter: result includes repaired candidate tuples") {
    val d = freshDaisy()
    val res = d.execute(QuerySpec("cities",
      where = Seq(Pred("city", "=", "Los Angeles")), select = Seq("zip", "city")))
    // Tuples 0, 1, 2 all carry the LA candidate after cleaning.
    assert(res.count() == 3)
    assert(d.lastReport.perRule.head.dirty == 3)
  }

  test("Example 3 query zip = 9001 returns the four qualifying tuples of Table 3") {
    val d = freshDaisy()
    val res = d.execute(QuerySpec("cities",
      where = Seq(Pred("zip", "=", "9001")), select = Seq("zip", "city")))
    // Tuples 0,1,2 plus tuple 3 whose zip candidates include 9001.
    assert(res.count() == 4)
  }

  test("gradual cleaning: a workload covering the dataset converges to the offline state") {
    val d = freshDaisy()
    d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "9001")),
      select = Seq("zip", "city")))
    d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "10001")),
      select = Seq("zip", "city")))
    val offline = OfflineCleaner.run(TestData.cities(spark), Seq(fd))
    assert(canon(d.state("cities"), Seq("zip", "city")) ==
      canon(offline.state, Seq("zip", "city")))
  }

  test("queries after full coverage skip cleaning via the checked flags") {
    val d = freshDaisy()
    d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "9001")),
      select = Seq("zip", "city")))
    d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "10001")),
      select = Seq("zip", "city")))
    val r3 = d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "9001")),
      select = Seq("zip", "city")))
    assert(r3.count() == 4)
    val rep = d.lastReport.perRule.head
    assert(rep.dirty == 0 || rep.skippedByPruning)
  }

  test("dirty-group pruning skips rules when the answer has no dirty values") {
    val df = spark.createDataFrame(Seq(
      (0L, "1", "a"), (1L, "1", "b"), (2L, "7", "k"), (3L, "8", "k")))
      .toDF("__tid", "zip", "city")
    val d = Daisy.single(spark, "t", df, Seq(fd))
    d.execute(QuerySpec("t", where = Seq(Pred("city", "=", "k")), select = Seq("zip", "city")))
    assert(d.lastReport.perRule.head.skippedByPruning)
    // ...and the state stays untouched for those tuples.
    assert(d.state("t").filter(ProbData.isDirty("city")).count() == 0)
  }

  test("group-by query cleans below the aggregation and aggregates qualifying tuples") {
    val rows = Seq(
      (0L, "1", "a", 10.0), (1L, "1", "b", 20.0), (2L, "2", "a", 30.0), (3L, "3", "c", 40.0))
    val df = spark.createDataFrame(rows).toDF("__tid", "zip", "city", "score")
    val d = Daisy.single(spark, "t", df, Seq(fd))
    val res = d.execute(QuerySpec("t", where = Seq(Pred("city", "=", "a")),
      groupBy = Seq("city"), aggs = Seq(Agg("sum", "score", "s"))))
    // Tuples 0,1 (group 1 dirty: candidates a/b) and 2 qualify city=a.
    val got = res.collect().map(r => (r.getString(0), r.getDouble(1))).toMap
    assert(got.values.sum == 60.0)
    assert(d.lastReport.plan.operatorOrder.exists(_.startsWith("clean_σ")))
  }

  test("aggregate without grouping works") {
    val d = freshDaisy()
    val res = d.execute(QuerySpec("cities", where = Seq(Pred("zip", "=", "10001")),
      aggs = Seq(Agg("count", "zip", "n"))))
    assert(res.collect().head.getLong(0) > 0)
  }

  test("SPJ: join cleaning updates both relations and the join result (Example 6)") {
    val d = new Daisy(spark,
      Map("cities" -> TestData.citiesJoin(spark), "emp" -> TestData.employees(spark)),
      Map("cities" -> Seq(fd), "emp" -> Seq(TestData.empFd)))
    val res = d.execute(QuerySpec("cities",
      where = Seq(Pred("city", "=", "Los Angeles")),
      select = Seq("zip", "ename"),
      join = Some(JoinSpec("emp", "zip", "ezip"))))
    val names = res.select("ename").collect().map(_.getString(0)).toSet
    assert(names == Set("Peter", "Mary", "Jon"))
    // Both relations were updated in place.
    assert(d.state("cities").filter(ProbData.isDirty("zip")).count() == 1)
    assert(d.state("emp").filter(ProbData.isDirty("ezip")).count() == 2)
  }

  test("DC rule: incremental detection repairs the Example 5 violation at query time") {
    val d = Daisy.single(spark, "sal", TestData.salaries(spark), Seq(TestData.salaryDc),
      DaisyOptions(dcThreshold = 1.1)) // never force full cleaning
    d.execute(QuerySpec("sal", where = Seq(Pred("salary", ">=", "2000")),
      select = Seq("salary", "tax")))
    val sal = TestData.candsOf(d.state("sal"), "salary")
    assert(sal(2L) == Seq(("2000.0", "<", 0.5), ("3000.0", "=", 0.5)))
    assert(d.lastReport.perRule.head.dcDecision.isDefined)
  }

  test("DC rule: low predicted accuracy falls back to full cleaning (Algorithm 2)") {
    val d = Daisy.single(spark, "sal", TestData.salaries(spark), Seq(TestData.salaryDc),
      DaisyOptions(dcThreshold = 0.0))
    d.execute(QuerySpec("sal", where = Seq(Pred("salary", "<", "1500")),
      select = Seq("salary", "tax")))
    val dec = d.lastReport.perRule.head.dcDecision
    // The violating pair lies outside the tiny answer: with threshold 0
    // any estimated outside error forces the full pass, which finds it.
    val sal = TestData.candsOf(d.state("sal"), "salary")
    assert(sal(2L).nonEmpty, s"decision was $dec")
  }

  test("incremental DC checking never re-checks seen×seen pairs") {
    val d = Daisy.single(spark, "sal", TestData.salaries(spark), Seq(TestData.salaryDc),
      DaisyOptions(dcThreshold = 1.1))
    d.execute(QuerySpec("sal", where = Seq(Pred("salary", ">=", "1000")),
      select = Seq("salary", "tax")))
    val before = TestData.candsOf(d.state("sal"), "salary")
    d.execute(QuerySpec("sal", where = Seq(Pred("salary", ">=", "1000")),
      select = Seq("salary", "tax")))
    val after = TestData.candsOf(d.state("sal"), "salary")
    assert(before == after, "re-querying must not change the fixes")
  }

  test("cost-model switch cleans the remaining dirty part once") {
    val data = SSB.lineorder(spark, 2000, 50, 10)
    val d = Daisy.single(spark, "lo", data.dirty, Seq(SSB.Phi))
    // Narrow repeated queries eventually trip the inequality.
    var switched = false
    for (i <- 0 until 30 if !switched) {
      d.execute(QuerySpec("lo", where = Seq(Pred("orderkey", "=", s"o_${i % 50}")),
        select = Seq("orderkey", "suppkey")))
      switched = d.lastReport.perRule.exists(_.switchedToFull)
    }
    if (switched) {
      // After the switch everything is checked.
      assert(d.state("lo").filter(!ProbData.checkedBy(SSB.Phi.id)).count() == 0)
    }
    // Regardless, the final state matches offline bulk cleaning after
    // covering the rest explicitly.
    d.cleanTableFully("lo")
    val offline = OfflineCleaner.run(data.dirty, Seq(SSB.Phi))
    assert(canon(d.state("lo"), Seq("orderkey", "suppkey")) ==
      canon(offline.state, Seq("orderkey", "suppkey")))
  }

  test("incremental-only mode (no cost model) never switches") {
    val data = SSB.lineorder(spark, 500, 20, 5)
    val d = Daisy.single(spark, "lo", data.dirty, Seq(SSB.Phi),
      DaisyOptions(useCostModel = false))
    for (i <- 0 until 5)
      d.execute(QuerySpec("lo", where = Seq(Pred("orderkey", "=", s"o_$i")),
        select = Seq("orderkey", "suppkey")))
    assert(!d.lastReport.perRule.exists(_.switchedToFull))
  }

  test("addRule: a later rule merges over provenance without recomputation (Table 7)") {
    // zip→city cleaned first; then a second rule name→zip arrives.
    val df = spark.createDataFrame(Seq(
      (0L, "9001", "LA", "hospA"), (1L, "9001", "SF", "hospA"),
      (2L, "10001", "NY", "hospB"), (3L, "10002", "NY", "hospB")))
      .toDF("__tid", "zip", "city", "name")
    val phi2 = Fd("phi2", "name", "zip")
    val d = Daisy.single(spark, "h", df, Seq(fd))
    d.execute(QuerySpec("h", select = Seq("zip", "city")))
    val cityBefore = TestData.candsOf(d.state("h"), "city")
    d.addRule("h", phi2)
    d.execute(QuerySpec("h", select = Seq("zip", "city", "name")))
    // φ1 fixes survive; φ2 adds zip candidates for the name groups.
    assert(TestData.candsOf(d.state("h"), "city") == cityBefore)
    val zip = TestData.candsOf(d.state("h"), "zip")
    assert(zip(2L).map(c => (c._1, c._2)) == Seq(("10001", "="), ("10002", "=")))
  }

  test("probabilisticView renders candidates for every rule attribute") {
    val d = freshDaisy()
    d.execute(QuerySpec("cities", select = Seq("zip", "city")))
    val v = d.probabilisticView("cities")
    assert(v.columns.contains("zip__view") && v.columns.contains("city__view"))
    val row0 = v.filter(col("__tid") === 0L).select("city__view").collect().head.getString(0)
    assert(row0 == "Los Angeles@0.67|San Francisco@0.33")
  }

  test("a whole-dataset query cleans everything in one shot") {
    val d = freshDaisy()
    d.execute(QuerySpec("cities", select = Seq("zip", "city")))
    assert(d.state("cities").filter(!ProbData.checkedBy(fd.id)).count() == 0)
    val offline = OfflineCleaner.run(TestData.cities(spark), Seq(fd))
    assert(canon(d.state("cities"), Seq("zip", "city")) ==
      canon(offline.state, Seq("zip", "city")))
  }

  test("an attribute constrained by two inequality DCs is rejected") {
    val dc2 = InequalityDc("other", Seq(Atom("salary", ">"), Atom("tax", "<")))
    assertThrows[IllegalArgumentException] {
      Daisy.single(spark, "sal", TestData.salaries(spark),
        Seq(TestData.salaryDc, dc2))
    }
  }
}

package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.ProbData.MaterializeOps

/** clean_σ and the probabilistic/incremental join (§4.1, §4.4). */
class CleanOpsSpec extends SparkSpec {

  private lazy val state = ProbData.init(TestData.cities(spark), Seq(TestData.cityFd))
  private val fd = TestData.cityFd

  test("clean_σ on a rhs filter relaxes, repairs and marks checked") {
    val a = state.filter(col("city") === "Los Angeles").select("__tid")
    val out = CleanOps.cleanSelectFd(state, a, fd, maxIter = 1)
    assert(TestData.tids(out.relaxed.tids) == Seq(0L, 1L, 2L))
    assert(out.fixes.nDirty == 3)
    assert(out.state.filter(ProbData.checkedBy(fd.id)).count() == 3)
    val city = TestData.candsOf(out.state, "city")
    assert(city(0L) == Seq(("Los Angeles", "=", 0.67), ("San Francisco", "=", 0.33)))
  }

  test("clean_σ skips tuples already checked by the rule") {
    val a = state.filter(col("city") === "Los Angeles").select("__tid")
    val once = CleanOps.cleanSelectFd(state, a, fd, maxIter = 1)
    val twice = CleanOps.cleanSelectFd(once.state, a, fd, maxIter = 1)
    assert(twice.fixes.nDirty == 0)
    // Probabilities unchanged after the no-op second pass.
    val city = TestData.candsOf(twice.state, "city")
    assert(city(0L) == Seq(("Los Angeles", "=", 0.67), ("San Francisco", "=", 0.33)))
  }

  // ---- probabilistic join: Example 6 / Table 4 -------------------------

  private lazy val citiesJ = ProbData.init(TestData.citiesJoin(spark), Seq(fd))
  private lazy val emps    = ProbData.init(TestData.employees(spark), Seq(TestData.empFd))

  test("dirty join result misses pairs hidden by errors (Table 4c, oracle)") {
    val la = citiesJ.filter(col("city") === "Los Angeles")
    val j = CleanOps.probEquiJoin(la, emps, "zip", "ezip")
    Oracle.assertEquivalent(j.select(col("zip"), col("ename").as("name")),
      """SELECT c.zip AS zip, e.ename AS name FROM cities c JOIN emp e ON c.zip = e.ezip
         WHERE c.city = 'Los Angeles'""",
      "cities" -> TestData.citiesJoin(spark).drop("__tid"),
      "emp" -> TestData.employees(spark).drop("__tid"))
  }

  test("Example 6: after clean_σ the relaxed city part has probabilistic zips (Table 4d)") {
    val a = citiesJ.filter(col("city") === "Los Angeles").select("__tid")
    val out = CleanOps.cleanSelectFd(citiesJ, a, fd, maxIter = 1)
    val zip = TestData.candsOf(out.state, "zip")
    assert(zip(1L) == Seq(("10001", "=", 0.5), ("9001", "=", 0.5)))
  }

  test("Example 6: probabilistic join matches on candidate overlap (Table 4e)") {
    val a = citiesJ.filter(col("city") === "Los Angeles").select("__tid")
    val cleanedC = CleanOps.cleanSelectFd(citiesJ, a, fd, maxIter = 1).state
    val laPart = cleanedC.filter(ProbData.qualifies(cleanedC, Pred("city", "=", "Los Angeles")))
    val j = CleanOps.probEquiJoin(laPart, emps, "zip", "ezip")
    val pairs = j.select("__ltid", "__rtid").collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    // t0 (9001) ⋈ Peter (9001); t1 {9001,10001} ⋈ Peter and Mary.
    assert(pairs == Set((0L, 2L), (1L, 2L), (1L, 1L)))
  }

  test("Example 6: cleaning the employee side adds Jon via phone → zip (Table 4e)") {
    val a = citiesJ.filter(col("city") === "Los Angeles").select("__tid")
    val cleanedC = CleanOps.cleanSelectFd(citiesJ, a, fd, maxIter = 1).state
    val laPart = cleanedC.filter(ProbData.qualifies(cleanedC, Pred("city", "=", "Los Angeles")))
      .materialized
    val j0 = CleanOps.probEquiJoin(laPart, emps, "zip", "ezip")
    val rq = j0.select(col("__rtid").as("__tid"))
    val outE = CleanOps.cleanSelectFd(emps, rq, TestData.empFd)
    // Jon and Mary share phone 12345 with different zips → both get
    // candidates {10001 50%, 10002 50%}.
    val ez = TestData.candsOf(outE.state, "ezip")
    assert(ez(0L) == Seq(("10001", "=", 0.5), ("10002", "=", 0.5)))
    assert(ez(1L) == Seq(("10001", "=", 0.5), ("10002", "=", 0.5)))

    val changed = outE.state.filter(ProbData.isDirty("ezip")).select("__tid")
    val j1 = CleanOps.incrementalJoin(j0, laPart,
      outE.state.join(changed, "__tid"), "zip", "ezip")
    val names = j1.select("ename").collect().map(_.getString(0)).toSet
    assert(names == Set("Peter", "Mary", "Jon"))
  }

  test("incremental join equals recomputing the full probabilistic join (Lemma 5)") {
    val a = citiesJ.filter(col("city") === "Los Angeles").select("__tid")
    val cleanedC = CleanOps.cleanSelectFd(citiesJ, a, fd, maxIter = 1).state
    val laPart = cleanedC.filter(ProbData.qualifies(cleanedC, Pred("city", "=", "Los Angeles")))
      .materialized
    val j0 = CleanOps.probEquiJoin(laPart, emps, "zip", "ezip")
    val rq = j0.select(col("__rtid").as("__tid"))
    val cleanedE = CleanOps.cleanSelectFd(emps, rq, TestData.empFd).state.materialized

    val changed = cleanedE.filter(ProbData.isDirty("ezip")).select("__tid")
    val incr = CleanOps.incrementalJoin(j0, laPart, cleanedE.join(changed, "__tid"),
      "zip", "ezip")
    val full = CleanOps.probEquiJoin(laPart, cleanedE, "zip", "ezip")
    val pi = incr.select("__ltid", "__rtid").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val pf = full.select("__ltid", "__rtid").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(pi == pf)
  }

  test("probEquiJoin keeps lineage tids of both sides") {
    val j = CleanOps.probEquiJoin(citiesJ, emps, "zip", "ezip")
    assert(j.columns.contains("__ltid") && j.columns.contains("__rtid"))
  }

  test("probEquiJoin on clean keys equals a plain equi-join (oracle)") {
    val j = CleanOps.probEquiJoin(citiesJ, emps, "zip", "ezip")
      .select(col("city"), col("ename").as("name"))
    Oracle.assertEquivalent(j,
      "SELECT c.city AS city, e.ename AS name FROM cities c JOIN emp e ON c.zip = e.ezip",
      "cities" -> TestData.citiesJoin(spark).drop("__tid"),
      "emp" -> TestData.employees(spark).drop("__tid"))
  }
}

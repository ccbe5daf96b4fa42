package repro.holoclean

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core._
import repro.data.Hospital
import repro.core.ProbData.MaterializeOps

/** HoloClean-lite comparator: detection, domains, inference, metrics. */
class HolocleanLiteSpec extends SparkSpec {

  private lazy val hosp = Hospital.generate(spark, nHospitals = 40, rowsPer = 6,
    nTie = 4, nMinority = 5, nZipErr = 5, zipErrRows = 2)
  private lazy val dirty = hosp.dirty.materialized

  test("dirtyCells flags rhs cells of violating groups") {
    val cells = HolocleanLite.dirtyCells(dirty, Seq(Hospital.Phi1))
    assert(cells.filter(col("attr") === "city").count() > 0)
    // φ1 alone cannot see the typo-zip errors (fresh zips form clean
    // φ1 groups): no zip-error row gets its zip cell flagged. Zip cells
    // of city-dirty groups may legitimately be flagged (a city spans
    // several zips).
    val zipCells = cells.filter(col("attr") === "zip").select("__tid")
    val zipErrRows = hosp.errors.filter(col("attr") === "zip").select("__tid")
    assert(zipCells.join(zipErrRows, "__tid").count() == 0)
  }

  test("dirtyCells with φ2 flags the zip cells of corrupted hospitals") {
    val cells = HolocleanLite.dirtyCells(dirty, Seq(Hospital.Phi2))
    assert(cells.filter(col("attr") === "zip").count() > 0)
  }

  test("co-occurrence domains contain the true value for city errors") {
    val cells = HolocleanLite.dirtyCells(dirty, Seq(Hospital.Phi1))
    val domains = HolocleanLite.coocDomains(dirty, cells, k = 4)
    val withTruth = domains.join(hosp.errors.filter(col("attr") === "city"),
      Seq("__tid", "attr"))
    val covered = withTruth.filter(col("v") === col("truth"))
      .select("__tid").distinct().count()
    val total = hosp.errors.filter(col("attr") === "city").count()
    assert(covered >= total * 8 / 10, s"domain covers $covered of $total truths")
  }

  test("domain pruning caps candidates per cell") {
    val cells = HolocleanLite.dirtyCells(dirty, Seq(Hospital.Phi1))
    val domains = HolocleanLite.coocDomains(dirty, cells, k = 2)
    val maxPerCell = domains.groupBy("__tid", "attr").count()
      .agg(max("count")).collect().head.getLong(0)
    assert(maxPerCell <= 2)
  }

  test("inference repairs the minority city errors correctly") {
    val fds = Seq(Hospital.Phi1)
    val rep = HolocleanLite.run(dirty, fds)
    val m = HolocleanLite.accuracy(rep.updates, hosp.errors.materialized)
    assert(m.precision > 0.8, s"precision ${m.precision}")
    assert(m.recall > 0.2, s"recall ${m.recall}")
  }

  test("with all three rules recall improves (zip errors become visible)") {
    val m1 = HolocleanLite.accuracy(
      HolocleanLite.run(dirty, Seq(Hospital.Phi1)).updates, hosp.errors)
    val m3 = HolocleanLite.accuracy(
      HolocleanLite.run(dirty, Hospital.Rules).updates, hosp.errors)
    assert(m3.recall > m1.recall)
  }

  test("daisyDomains extracts (tid, attr, v, p, orig) from a probabilistic state") {
    val d = Daisy.single(spark, "h", dirty, Seq(Hospital.Phi1))
    d.execute(QuerySpec("h", select = Seq("zip", "city")))
    val doms = HolocleanLite.daisyDomains(d.state("h"), Seq("zip", "city"))
    assert(doms.columns.toSet == Set("__tid", "attr", "v", "p", "orig"))
    assert(doms.count() > 0)
    assert(doms.filter(col("p") <= 0 || col("p") > 1).count() == 0)
  }

  test("DaisyP picks the most probable candidate and reports updates only") {
    val d = Daisy.single(spark, "h", dirty, Seq(Hospital.Phi1))
    d.execute(QuerySpec("h", select = Seq("zip", "city")))
    val doms = HolocleanLite.daisyDomains(d.state("h"), Seq("zip", "city"))
      .materialized
    val rep = HolocleanLite.daisyP(doms)
    // Updates never re-assert the original value.
    val joined = rep.updates.join(doms.select(col("__tid"), col("attr"), col("orig")).distinct(),
      Seq("__tid", "attr"))
    assert(joined.filter(col("v") === col("orig")).count() == 0)
  }

  test("DaisyH on Daisy domains beats DaisyP on the tie groups") {
    val d = Daisy.single(spark, "h", dirty, Seq(Hospital.Phi1))
    d.execute(QuerySpec("h", select = Seq("zip", "city")))
    val doms = HolocleanLite.daisyDomains(d.state("h"), Seq("zip", "city"))
      .materialized
    val mp = HolocleanLite.accuracy(HolocleanLite.daisyP(doms).updates, hosp.errors)
    val mh = HolocleanLite.accuracy(
      HolocleanLite.runDaisyH(dirty, doms, Seq(Hospital.Phi1)).updates, hosp.errors)
    assert(mh.precision >= mp.precision,
      s"DaisyH ${mh.precision} should not trail DaisyP ${mp.precision}")
  }

  test("accuracy metrics: hand-computed example") {
    val updates = spark.createDataFrame(Seq(
      (0L, "city", "right"), (1L, "city", "wrong"), (2L, "city", "right")))
      .toDF("__tid", "attr", "v")
    val errors = spark.createDataFrame(Seq(
      (0L, "city", "right", "bad"), (2L, "city", "right", "bad"),
      (3L, "city", "missed", "bad"), (4L, "city", "missed", "bad")))
      .toDF("__tid", "attr", "truth", "dirty")
    val m = HolocleanLite.accuracy(updates, errors)
    assert(m.nUpdates == 3 && m.nCorrect == 2 && m.nErrors == 4)
    assert(math.abs(m.precision - 2.0 / 3) < 1e-9)
    assert(math.abs(m.recall - 0.5) < 1e-9)
    assert(m.f1 > 0.5 && m.f1 < 0.6)
  }

  test("no dirty cells means no updates") {
    val clean = spark.createDataFrame(Seq(
      (0L, "1", "a", "x"), (1L, "2", "b", "y")))
      .toDF("__tid", "zip", "city", "other")
    val rep = HolocleanLite.run(clean, Seq(Fd("f", "zip", "city")))
    assert(rep.updates.count() == 0)
  }
}

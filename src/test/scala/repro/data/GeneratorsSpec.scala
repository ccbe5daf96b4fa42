package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Relaxation

/** Synthetic dirty-dataset generators: determinism, error structure. */
class GeneratorsSpec extends SparkSpec {

  // ---- Hospital -------------------------------------------------------

  private lazy val hosp = Hospital.generate(spark, nHospitals = 50, rowsPer = 8,
    nTie = 5, nMinority = 6, nZipErr = 6, zipErrRows = 3)

  test("hospital: 19 data attributes") {
    assert(hosp.dirty.columns.count(!_.startsWith("__")) == 19)
  }

  test("hospital: deterministic in its parameters") {
    val again = Hospital.generate(spark, nHospitals = 50, rowsPer = 8,
      nTie = 5, nMinority = 6, nZipErr = 6, zipErrRows = 3)
    assert(hosp.dirty.collect().map(_.toString).sorted.toSeq ==
      again.dirty.collect().map(_.toString).sorted.toSeq)
  }

  test("hospital: errors recorded match the dirty/clean diff") {
    val diff = hosp.dirty.select("__tid", "city", "zip")
      .join(hosp.clean.select(col("__tid"), col("city").as("c0"), col("zip").as("z0")), "__tid")
      .filter(col("city") =!= col("c0") || col("zip") =!= col("z0"))
    assert(diff.count() == hosp.errors.count())
  }

  test("hospital: tie hospitals have exactly half their rows corrupted") {
    val cityErrs = hosp.errors.filter(col("attr") === "city")
    val perHosp = cityErrs.join(hosp.clean.select("__tid", "name"), "__tid")
      .groupBy("name").count().collect().map(_.getLong(1))
    assert(perHosp.contains(4L)) // ties: 8/2
    assert(perHosp.contains(1L)) // minorities
  }

  test("hospital: φ1 violations exist, typo zips stay φ1-clean (oracle)") {
    Oracle.assertEquivalent(
      hosp.dirty.groupBy("zip").agg(countDistinct("city").cast("long").as("n"))
        .filter(col("n") > 1).select("zip"),
      "SELECT zip FROM h GROUP BY zip HAVING COUNT(DISTINCT city) > 1",
      "h" -> hosp.dirty.drop("__tid"))
    val typoZipGroups = hosp.dirty.filter(col("zip").startsWith("z_typo"))
      .groupBy("zip").agg(countDistinct("city").as("n")).filter(col("n") > 1)
    assert(typoZipGroups.count() == 0)
  }

  test("hospital: zip errors violate φ2 and φ3") {
    val nameGroups = hosp.dirty.groupBy("name").agg(countDistinct("zip").as("n"))
      .filter(col("n") > 1).count()
    val phoneGroups = hosp.dirty.groupBy("phone").agg(countDistinct("zip").as("n"))
      .filter(col("n") > 1).count()
    assert(nameGroups == 6 && phoneGroups == 6)
  }

  test("hospital: ~5% error rate at defaults") {
    val d = Hospital.generate(spark)
    val rate = d.errors.count().toDouble / d.dirty.count()
    assert(rate > 0.02 && rate < 0.15, s"rate $rate")
  }

  // ---- Nestle ---------------------------------------------------------

  private lazy val nestle = Nestle.generate(spark, nRows = 8000, nMaterials = 100)

  test("nestle: 95% of materials conflict") {
    val conflicting = nestle.dirty.groupBy("material")
      .agg(countDistinct("category").as("n")).filter(col("n") > 1).count()
    assert(conflicting >= 90 && conflicting <= 100, s"$conflicting materials conflict")
  }

  test("nestle: category has low selectivity (few distinct values)") {
    assert(nestle.dirty.select("category").distinct().count() <= 15)
  }

  test("nestle: ~10% of rows of dirty materials are edited") {
    val rate = nestle.errors.count().toDouble / nestle.dirty.count()
    assert(rate > 0.05 && rate < 0.15, s"rate $rate")
  }

  test("nestle: wrong category is an existing category value") {
    val cats = nestle.clean.select("category").distinct().collect().map(_.getString(0)).toSet
    val wrong = nestle.errors.select("dirty").distinct().collect().map(_.getString(0)).toSet
    assert(wrong.subsetOf(cats))
  }

  // ---- Air quality ----------------------------------------------------

  test("air quality: violation share tracks the knob") {
    for (share <- Seq(0.3, 0.97)) {
      val d = AirQuality.generate(spark, 20000, nCounties = 100, violationShare = share)
      val dirtyPairs = d.dirty.groupBy("county_code", "state_code")
        .agg(countDistinct("county_name").as("n")).filter(col("n") > 1)
        .select("county_code", "state_code")
      val rowsInViolatingGroups = d.dirty
        .join(dirtyPairs, Seq("county_code", "state_code")).count()
      val got = rowsInViolatingGroups.toDouble / d.dirty.count()
      assert(math.abs(got - share) < 0.12, s"share $share measured $got")
    }
  }

  test("air quality: multi-attribute FD violations detectable via group-by (oracle)") {
    val d = AirQuality.generate(spark, 5000, nCounties = 50, violationShare = 0.3)
    val groups = d.dirty
      .select(concat_ws(Relaxation.Sep, col("county_code"), col("state_code")).as("lv"),
        col("county_name"))
      .groupBy("lv").agg(countDistinct("county_name").cast("long").as("n"))
      .filter(col("n") > 1)
    val viaSql = d.dirty.groupBy("county_code", "state_code")
      .agg(countDistinct("county_name").as("n")).filter(col("n") > 1).count()
    assert(groups.count() == viaSql)
  }

  test("air quality: co measurements are numeric") {
    val d = AirQuality.generate(spark, 1000, 50, 0.3)
    assert(d.dirty.schema("co").dataType.typeName == "double")
  }

  // ---- SSB ------------------------------------------------------------

  test("ssb lineorder: every orderkey has one true suppkey; ~10% edited") {
    val d = SSB.lineorder(spark, 5000, 100, 20)
    val dirtyGroups = d.dirty.groupBy("orderkey")
      .agg(countDistinct("suppkey").as("n")).filter(col("n") > 1).count()
    assert(dirtyGroups > 50, s"$dirtyGroups dirty orderkeys")
    val rate = d.errors.count().toDouble / d.dirty.count()
    assert(rate > 0.05 && rate < 0.15)
  }

  test("ssb lineorder: errOrderPct limits the dirty orderkeys") {
    val d = SSB.lineorder(spark, 5000, 100, 20, errOrderPct = 0.2)
    val dirtyGroups = d.dirty.groupBy("orderkey")
      .agg(countDistinct("suppkey").as("n")).filter(col("n") > 1).count()
    assert(dirtyGroups <= 25, s"$dirtyGroups dirty orderkeys")
  }

  test("ssb lineorder: clean version satisfies the price/discount DC") {
    val d = SSB.lineorder(spark, 500, 20, 5)
    val t = d.clean.select("extendedprice", "discount")
    val viol = t.as("a").crossJoin(t.as("b"))
      .filter(col("a.extendedprice") < col("b.extendedprice") &&
        col("a.discount") > col("b.discount")).count()
    assert(viol == 0)
  }

  test("ssb lineorder: discount errors create sparse DC violations") {
    val d = SSB.lineorder(spark, 500, 20, 5, discountErrPct = 0.05)
    val t = d.dirty.select("extendedprice", "discount")
    val viol = t.as("a").crossJoin(t.as("b"))
      .filter(col("a.extendedprice") < col("b.extendedprice") &&
        col("a.discount") > col("b.discount")).count()
    assert(viol > 0 && viol < 500L * 500 / 20, s"$viol violating ordered pairs")
  }

  test("ssb supplier: address→suppkey violations on the configured share") {
    val d = SSB.supplier(spark, 50, errAddrPct = 0.2)
    val dirtyAddrs = d.dirty.groupBy("address")
      .agg(countDistinct("suppkey").as("n")).filter(col("n") > 1).count()
    assert(dirtyAddrs == 10)
  }
}

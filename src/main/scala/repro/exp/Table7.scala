package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.Hospital
import repro.holoclean.HolocleanLite
import repro.core.ProbData.MaterializeOps

/** Table 7 (§7.3): the provenance benefit. Rules arrive incrementally
  * (φ1, then φ2, then φ3) while the user queries the whole dataset.
  *
  *  - "Daisy (3 executions)": each rule set is cleaned from scratch in
  *    a fresh session — the cost of re-running the task.
  *  - "Daisy (1 execution)": a single session keeps the probabilistic
  *    state and the provenance (original values); a new rule only adds
  *    the cost of checking itself and merging its fixes.
  *  - HoloClean: three independent runs.
  */
object Table7 {

  final case class Row(system: String, step: String, seconds: Double)

  /** Paper numbers (seconds). */
  val paper: Seq[Row] = Seq(
    Row("Daisy (3 executions)", "phi1", 51), Row("Daisy (3 executions)", "phi1+phi2", 49),
    Row("Daisy (3 executions)", "phi1+phi2+phi3", 118), Row("Daisy (3 executions)", "Total", 218),
    Row("Daisy (1 execution)", "phi1", 51), Row("Daisy (1 execution)", "phi1+phi2", 41),
    Row("Daisy (1 execution)", "phi1+phi2+phi3", 40), Row("Daisy (1 execution)", "Total", 132),
    Row("Holoclean", "phi1", 1020), Row("Holoclean", "phi1+phi2", 1108),
    Row("Holoclean", "phi1+phi2+phi3", 1188), Row("Holoclean", "Total", 3316),
  )

  def run(spark: SparkSession, nHospitals: Int = 4000, rowsPer: Int = 25,
          includeHoloclean: Boolean = true): Seq[Row] = {
    val data = Hospital.generate(spark, nHospitals, rowsPer,
      nTie = nHospitals / 10, nMinority = nHospitals / 8, nZipErr = nHospitals / 8)
    val dirty = data.dirty.materialized
    val allAttrs = Hospital.Rules.flatMap(_.attrs).distinct
    val workload = Workloads.hospitalWorkload(allAttrs)

    // Daisy, 3 separate executions (fresh session per rule set).
    val threeExec = Table5.ruleSets.map { case (name, fds) =>
      val daisy = Daisy.single(spark, "hospital", dirty, fds)
      Row("Daisy (3 executions)", name, Workloads.runWorkload(daisy, workload))
    }

    // Daisy, 1 incremental execution: rules are added to a live session.
    val daisy1 = Daisy.single(spark, "hospital", dirty, Seq(Hospital.Phi1))
    val (_, s1) = Workloads.timed { workload.foreach(daisy1.execute) }
    daisy1.addRule("hospital", Hospital.Phi2)
    val (_, s2) = Workloads.timed { workload.foreach(daisy1.execute) }
    daisy1.addRule("hospital", Hospital.Phi3)
    val (_, s3) = Workloads.timed { workload.foreach(daisy1.execute) }
    val oneExec = Seq(
      Row("Daisy (1 execution)", "phi1", s1),
      Row("Daisy (1 execution)", "phi1+phi2", s2),
      Row("Daisy (1 execution)", "phi1+phi2+phi3", s3),
    )

    val hcRows = if (includeHoloclean)
      Table5.ruleSets.map { case (name, fds) =>
        Row("Holoclean", name, HolocleanLite.run(dirty, fds).seconds)
      }
    else Nil

    def withTotal(rows: Seq[Row]): Seq[Row] = rows.headOption match {
      case Some(h) => rows :+ Row(h.system, "Total", rows.map(_.seconds).sum)
      case None    => rows
    }
    withTotal(threeExec) ++ withTotal(oneExec) ++ withTotal(hcRows)
  }

  def render(measured: Seq[Row]): String = {
    val sb = new StringBuilder
    sb.append(f"${"system"}%-22s ${"step"}%-15s ${"sec"}%8s   (paper sec)\n")
    for (r <- measured) {
      val p = paper.find(x => x.system == r.system && x.step == r.step)
      sb.append(f"${r.system}%-22s ${r.step}%-15s ${r.seconds}%8.1f   " +
        p.map(x => f"(${x.seconds}%6.0f)").getOrElse("") + "\n")
    }
    sb.toString
  }
}

package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Holistic repair of general DC violations (§4.2, Example 5).
  *
  * For every violating pair and every atom, a tuple can resolve the
  * conflict by moving the atom's attribute into the range that inverts
  * the atom's condition (the SAT-formula view of §4.2: a subset of
  * atoms must become false). With k atoms and single-atom (minimal)
  * fixes, each attribute of the tuple keeps its original value in k−1
  * of the k possible fixes and takes the inverted range in one — the
  * 50%/50% split of Example 5 for k = 2. `maxFixAtoms > 1` adds the
  * larger atom subsets ("the pairwise combinations of all three
  * candidate fixes"); probabilities stay frequency-based over the
  * enumerated fix set.
  *
  * Range candidates are stored as (v = bound, op = "<" or ">"); a
  * tuple participating in several violating pairs accumulates
  * candidates which merge by (v, op) with support counts (§4.3).
  */
object DcRepair {

  private val tidC = ProbData.TidCol

  /** Candidate rows (tid, attr, v, op, n) for every tuple of every
    * violating pair found by [[ThetaJoin.violations]].
    */
  def candidateRows(violations: DataFrame, dc: InequalityDc, maxFixAtoms: Int = 1): DataFrame = {
    val k = dc.atoms.size
    val subsets = (1 to math.min(maxFixAtoms, k)).flatMap(sz =>
      dc.atoms.indices.combinations(sz).map(_.toSet))
    val nFixes = subsets.size

    // For each tuple side and each attribute: how many fixes change it
    // vs keep it. With distinct atom attributes, attr of atom i changes
    // in the fixes whose subset contains i.
    val changesPerAtom = dc.atoms.indices.map(i => subsets.count(_.contains(i)))

    val spark = violations.sparkSession
    import spark.implicits._

    val rows = violations.select(
      col(tidC + "1"), col(tidC + "2"), col("dir"),
      array(dc.attrs.map(a => col(a + "1")): _*).as("vals1"),
      array(dc.attrs.map(a => col(a + "2")): _*).as("vals2"))

    // Orientation-expanded: one row per ordered violation.
    val oriented = rows
      .withColumn("__o", explode(
        when(col("dir") === "both", array(lit("12"), lit("21")))
          .otherwise(array(col("dir")))))

    val attrIdx = dc.attrs.zipWithIndex.toMap

    // Per atom, per side: emit the range candidate and the original-
    // value candidate with the fix-frequency supports.
    val perAtom = dc.atoms.zipWithIndex.flatMap { case (at, i) =>
      val a = at.attr
      val vi = attrIdx(a)
      val chg = changesPerAtom(i)
      val keep = nFixes - chg
      val cands: Seq[org.apache.spark.sql.Column] = {
        val t1 = when(col("__o") === "12", col("vals1")(vi)).otherwise(col("vals2")(vi))
        val t2 = when(col("__o") === "12", col("vals2")(vi)).otherwise(col("vals1")(vi))
        val t1tid = when(col("__o") === "12", col(tidC + "1")).otherwise(col(tidC + "2"))
        val t2tid = when(col("__o") === "12", col(tidC + "2")).otherwise(col(tidC + "1"))
        Seq(
          struct(t1tid.as("tid"), lit(a).as("attr"), t1.cast("string").as("v"),
            lit("=").as("op"), lit(keep).as("n")),
          struct(t1tid.as("tid"), lit(a).as("attr"), t2.cast("string").as("v"),
            lit(at.invertedOpT1).as("op"), lit(chg).as("n")),
          struct(t2tid.as("tid"), lit(a).as("attr"), t2.cast("string").as("v"),
            lit("=").as("op"), lit(keep).as("n")),
          struct(t2tid.as("tid"), lit(a).as("attr"), t1.cast("string").as("v"),
            lit(at.invertedOpT2).as("op"), lit(chg).as("n")),
        )
      }
      cands
    }

    oriented
      .select(explode(array(perAtom: _*)).as("c"))
      .select(col("c.tid").as(tidC), col("c.attr"), col("c.v"), col("c.op"), col("c.n"))
      .filter(col("n") > 0)
  }

  /** Aggregates candidate rows into per-(tid, attr) candidate arrays
    * with frequency probabilities, shaped like [[ProbData.CandType]].
    */
  def fixes(violations: DataFrame, dc: InequalityDc, maxFixAtoms: Int = 1): DataFrame = {
    val cands = candidateRows(violations, dc, maxFixAtoms)
      .groupBy(tidC, "attr", "v", "op").agg(sum("n").as("n"))
    val perCell = cands.groupBy(tidC, "attr").agg(
      sum("n").as("tot"),
      array_sort(collect_list(struct(col("v"), col("op"), col("n")))).as("cs"))
    perCell.select(col(tidC), col("attr"),
      transform(col("cs"), c => struct(
        c.getField("v").as("v"), c.getField("op").as("op"),
        (c.getField("n") / col("tot")).cast("double").as("p"),
        lit("DC").as("w"), c.getField("n").cast("long").as("n"))).as("cands"))
  }

  /** Applies DC fixes to the state: pivots the per-attr fixes into the
    * sidecar columns (merge semantics) and marks `checkedTids` for
    * `dc.id`.
    */
  def applyFixes(state: DataFrame, fixesDf: DataFrame, checkedTids: DataFrame,
                 dc: InequalityDc): DataFrame = {
    var out = state
    for (a <- dc.attrs) {
      val fa = fixesDf.filter(col("attr") === a)
        .select(col(tidC), col("cands").as(s"__dcfix_$a"))
      out = out.join(fa, Seq(tidC), "left")
        .withColumn(ProbData.candCol(a),
          when(col(s"__dcfix_$a").isNull, col(ProbData.candCol(a)))
            .otherwise(ProbData.mergeCands(col(ProbData.candCol(a)), col(s"__dcfix_$a"))))
        .drop(s"__dcfix_$a")
    }
    ProbData.markChecked(out, checkedTids, dc.id)
  }

  /** Overwrite variant used by the incremental DC path: the fixes are
    * always recomputed from the *accumulated* violation-pair set, so
    * the candidate columns of the DC attributes are replaced, not
    * merged (an attribute may be governed by at most one DC — Daisy
    * asserts this at load).
    */
  def applyFixesOverwrite(state: DataFrame, fixesDf: DataFrame, checkedTids: DataFrame,
                          dc: InequalityDc): DataFrame = {
    var out = state
    for (a <- dc.attrs) {
      val fa = fixesDf.filter(col("attr") === a)
        .select(col(tidC), col("cands").as(s"__dcfix_$a"))
      out = out.join(fa, Seq(tidC), "left")
        .withColumn(ProbData.candCol(a), col(s"__dcfix_$a"))
        .drop(s"__dcfix_$a")
    }
    ProbData.markChecked(out, checkedTids, dc.id)
  }
}

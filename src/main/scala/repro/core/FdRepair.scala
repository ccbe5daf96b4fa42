package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.ProbData.MaterializeOps

/** FD violation detection and probabilistic repair (§4.1).
  *
  * Detection follows the BigDansing optimization the paper's own
  * offline comparator uses: a group-by on the lhs instead of a
  * self-join. Repair assigns each tuple of a violating lhs-group two
  * candidate worlds:
  *
  *  - world "R" (keep lhs): the rhs cell receives the distinct rhs
  *    values of same-lhs tuples with P(rhs | lhs) frequencies,
  *  - world "L" (keep rhs): the lhs cell receives the distinct lhs
  *    values of same-rhs tuples with P(lhs | rhs) frequencies — only
  *    when the tuple's rhs value co-occurs with >1 distinct lhs
  *    (Table 2b: "New York" keeps its clean zip).
  *
  * All statistics are computed over the *base* (original) values of
  * the supplied tuple subset — per §4.3 new rules are always executed
  * over the original data (the provenance Daisy maintains) and merged
  * into existing candidate sets afterwards.
  */
object FdRepair {

  /** Computed fixes for a tuple subset. */
  final case class Fixes(
      /** (tid, attr-candidate columns) — one row per dirty tuple. */
      fixes: DataFrame,
      /** Number of violating (dirty) tuples ε in the subset. */
      nDirty: Long,
      /** Number of violating lhs groups. */
      nDirtyGroups: Long)

  private val tidC = ProbData.TidCol

  /** Column name carrying the new rhs candidate set inside `fixes`. */
  def rhsFixCol(fd: Fd): String = s"__fix_${fd.rhs}"

  /** Column name carrying the new candidate set of lhs attribute `a`. */
  def lhsFixCol(a: String): String = s"__fix_$a"

  /** Base (original-value) lhs/rhs view of the subset: (tid, lv, rv). */
  private def baseView(state: DataFrame, subsetTids: DataFrame, fd: Fd): DataFrame = {
    val sub = subsetTids.select(col(subsetTids.columns.head).as(tidC)).distinct()
    state.join(sub, tidC)
      .select(col(tidC),
        concat_ws(Relaxation.Sep, fd.lhs.map(col): _*).as("lv"),
        col(fd.rhs).cast("string").as("rv"))
  }

  /** Detects violating lhs groups in the subset and computes the
    * probabilistic fixes for every tuple belonging to one.
    */
  def computeFixes(state: DataFrame, subsetTids: DataFrame, fd: Fd): Fixes = {
    // Materialized early: everything below joins against these views
    // repeatedly, and bounded plan depth keeps Catalyst's size-in-bytes
    // estimation (which multiplies across joins) cheap.
    val g = baseView(state, subsetTids, fd).materialized

    val pairCnt = g.groupBy("lv", "rv").agg(count(lit(1)).as("cnt")).materialized

    // P(lhs | rhs) statistics come from *every* tuple sharing an rhs
    // value with the subset, even outside the relaxed result — Table 2b
    // computes P(Zip | City=SF) = {9001 50%, 10001 50%} using the
    // (10001, SF) tuple that the one-iteration relaxation of Example 2
    // does not return. Those context tuples contribute statistics only;
    // they are neither repaired nor marked checked here.
    val rvs = g.select("rv").distinct()
    val pairCntCtx = state
      .select(col(tidC),
        concat_ws(Relaxation.Sep, fd.lhs.map(col): _*).as("lv"),
        col(fd.rhs).cast("string").as("rv"))
      .join(rvs, "rv")
      .groupBy("lv", "rv").agg(count(lit(1)).as("cnt"))
      .materialized

    // rhs candidates per dirty lhs group, P(rhs|lhs) = cnt / Σcnt.
    val byL = pairCnt.groupBy("lv").agg(
      countDistinct("rv").as("ndr"),
      sum("cnt").as("tot"),
      array_sort(collect_list(struct(col("rv"), col("cnt")))).as("cands"))
    val dirtyL = byL.filter(col("ndr") > 1)
      .select(col("lv"),
        transform(col("cands"), c => struct(
          c.getField("rv").as("v"), lit("=").as("op"),
          (c.getField("cnt") / col("tot")).cast("double").as("p"),
          lit("R").as("w"), c.getField("cnt").cast("long").as("n"))).as("rhsCands"))

    // lhs candidates per rhs value over the rhs-sharing context, P(lhs|rhs).
    val byR = pairCntCtx.groupBy("rv").agg(
      countDistinct("lv").as("ndl"),
      sum("cnt").as("tot"),
      array_sort(collect_list(struct(col("lv"), col("cnt")))).as("cands"))
    val multiR = byR.filter(col("ndl") > 1)
      .select(col("rv"),
        transform(col("cands"), c => struct(
          c.getField("lv").as("v"), lit("=").as("op"),
          (c.getField("cnt") / col("tot")).cast("double").as("p"),
          lit("L").as("w"), c.getField("cnt").cast("long").as("n"))).as("lvCands"))

    val dirtyTuples = g.join(dirtyL, "lv").materialized
    val nDirtyGroups = dirtyL.count()

    var fixes = dirtyTuples
      .join(multiR, Seq("rv"), "left")
      .select(col(tidC), col("rhsCands").as(rhsFixCol(fd)), col("lvCands"))

    // Confirmations (§4.3): a rule also contributes its conditional
    // distribution to cells that *other* rules already made
    // probabilistic, even when its own group is consistent —
    // P(zip | name) = {z, 100%} from a clean name-group merges into a
    // speculative candidate set from zip → city and re-weights the
    // original value ("the probability of each fix must combine the
    // probabilities that stem from all the rules affecting the cell").
    val dirtyFlags = state.select(col(tidC),
      (if (ProbData.hasCands(state, fd.rhs)) ProbData.isDirty(fd.rhs)
       else lit(false)).as("__dR"),
      (if (fd.lhs.size == 1 && ProbData.hasCands(state, fd.lhs.head))
        ProbData.isDirty(fd.lhs.head) else lit(false)).as("__dL"))
    val groupTot = byL.select(col("lv"), col("tot"))
    val rhsConf = g.join(dirtyFlags, tidC).filter(col("__dR"))
      .join(dirtyL.select("lv"), Seq("lv"), "left_anti")
      .join(groupTot, "lv")
      .select(col(tidC),
        array(struct(col("rv").as("v"), lit("=").as("op"), lit(1.0).as("p"),
          lit("R").as("w"), col("tot").cast("long").as("n"))).as(rhsFixCol(fd)),
        lit(null).cast(ProbData.CandType).as("lvCands"))
    val lhsConf = if (fd.lhs.size == 1) {
      g.join(dirtyFlags, tidC).filter(col("__dL"))
        .join(multiR.select("rv"), Seq("rv"), "left_anti")
        .join(pairCntCtx, Seq("lv", "rv"))
        .select(col(tidC),
          lit(null).cast(ProbData.CandType).as(rhsFixCol(fd)),
          array(struct(col("lv").as("v"), lit("=").as("op"), lit(1.0).as("p"),
            lit("L").as("w"), col("cnt").cast("long").as("n"))).as("lvCands"))
    } else rhsConf.limit(0)
    val confirmations = rhsConf.unionByName(lhsConf)
      .groupBy(tidC).agg(
        first(col(rhsFixCol(fd)), ignoreNulls = true).as(rhsFixCol(fd)),
        first(col("lvCands"), ignoreNulls = true).as("lvCands"))
    fixes = fixes.unionByName(confirmations)
      .groupBy(tidC).agg(
        first(col(rhsFixCol(fd)), ignoreNulls = true).as(rhsFixCol(fd)),
        first(col("lvCands"), ignoreNulls = true).as("lvCands"))

    // Split concatenated lhs candidates into per-attribute candidate
    // sets. For a single-attribute lhs this is exact; for multi-attr
    // lhs the per-attribute marginals lose cross-attribute correlation
    // (candidate combinations), which only the multi-attr air-quality
    // rule exercises — its repairs are rhs-side.
    val k = fd.lhs.size
    if (k == 1) {
      fixes = fixes.withColumnRenamed("lvCands", lhsFixCol(fd.lhs.head))
    } else {
      for ((a, i) <- fd.lhs.zipWithIndex) {
        val parts = transform(col("lvCands"), c => struct(
          element_at(split(c.getField("v"), Relaxation.Sep), i + 1).as("v"),
          c.getField("op").as("op"), c.getField("p").as("p"),
          c.getField("w").as("w"), c.getField("n").as("n")))
        fixes = fixes.withColumn(lhsFixCol(a),
          when(col("lvCands").isNull, lit(null).cast(ProbData.CandType))
            .otherwise(ProbData.mergeCands(parts, lit(null).cast(ProbData.CandType))))
      }
      fixes = fixes.drop("lvCands")
    }

    Fixes(fixes.materialized, dirtyTuples.count(), nDirtyGroups)
  }

  /** Applies `fixes` to the state: merges new candidate sets into the
    * sidecar columns (union semantics of §4.3) and marks every tuple
    * of `subsetTids` as checked by `fd`. Base columns are untouched —
    * they are the provenance to the original values.
    */
  def applyFixes(state: DataFrame, fixes: Fixes, subsetTids: DataFrame, fd: Fd): DataFrame = {
    var out = state.join(fixes.fixes, Seq(tidC), "left")
    for (a <- fd.lhs :+ fd.rhs) {
      val fixC = if (a == fd.rhs) rhsFixCol(fd) else lhsFixCol(a)
      val cc   = ProbData.candCol(a)
      out = out.withColumn(cc,
        when(col(fixC).isNull, col(cc))
          .otherwise(ProbData.mergeCands(col(cc), col(fixC))))
        .drop(fixC)
    }
    ProbData.markChecked(out, subsetTids, fd.id)
  }

  /** Detection only: the violating lhs groups of the subset (lv, ndr). */
  def violatingGroups(state: DataFrame, subsetTids: DataFrame, fd: Fd): DataFrame =
    baseView(state, subsetTids, fd)
      .groupBy("lv").agg(countDistinct("rv").as("ndr"))
      .filter(col("ndr") > 1)

  /** Average candidate-set size p of the dirty cells — the `p` of the
    * §5.2.3 inequality, approximated from the current fixes.
    */
  def avgCandidates(fixes: Fixes, fd: Fd): Double = {
    if (fixes.nDirty == 0) 0.0
    else {
      val row = fixes.fixes
        .select(avg(size(col(rhsFixCol(fd)))).as("a")).collect().head
      Option(row.get(0)).map(_.asInstanceOf[Double]).getOrElse(0.0)
    }
  }
}

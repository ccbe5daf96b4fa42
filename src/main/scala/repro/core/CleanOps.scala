package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.ProbData.MaterializeOps

/** The cleaning operators of §4: `clean_σ` (Definition 2) and the
  * probabilistic/incremental join machinery behind `clean_⋈`
  * (Definition 3). Both are DataFrame → DataFrame transforms; the
  * stateful orchestration (in-place dataset update, bookkeeping, cost
  * model) lives in [[Daisy]].
  */
object CleanOps {

  private val tidC = ProbData.TidCol

  /** Outcome of `clean_σ` for one FD. */
  final case class SelectOutcome(
      state: DataFrame,
      relaxed: Relaxation.Relaxed,
      fixes: FdRepair.Fixes)

  /** `clean_σ` (§4.1): relaxes the answer, detects and repairs the
    * violations of the relaxed subset that were not already checked by
    * this rule, and updates the relation in place. Tuples already
    * checked by `fd` are excluded from the repair statistics (their
    * candidate sets already reflect this rule) but the whole relaxed
    * subset is marked checked.
    */
  def cleanSelectFd(state: DataFrame, answerTids: DataFrame, fd: Fd,
                    maxIter: Int = 20): SelectOutcome = {
    val relaxed = Relaxation.relax(state, answerTids, fd, maxIter)
    val unchecked = state
      .filter(!ProbData.checkedBy(fd.id))
      .select(tidC)
      .join(relaxed.tids, tidC)
      .materialized
    val fixes = FdRepair.computeFixes(state, unchecked, fd)
    val newState = FdRepair.applyFixes(state, fixes, unchecked, fd)
      .materialized
    SelectOutcome(newState, relaxed, fixes)
  }

  /** Probabilistic equi-join (§4): a pair qualifies iff the candidate
    * value sets of the join keys overlap. The result keeps the lineage
    * (originating tuple ids of both sides, as the paper stores for
    * potential later inference) plus every column of both inputs;
    * right-side bookkeeping columns are prefixed with `__r`.
    */
  def probEquiJoin(left: DataFrame, right: DataFrame,
                   leftKey: String, rightKey: String): DataFrame = {
    val lv = ProbData.explodeValues(left, leftKey, "kv")
      .withColumnRenamed(tidC, "__ltid")
    val rv = ProbData.explodeValues(right, rightKey, "kv")
      .withColumnRenamed(tidC, "__rtid")
    val pairs = lv.join(rv, "kv").select("__ltid", "__rtid").distinct()

    val l = left.withColumnRenamed(tidC, "__ltid")
    val r = renameRight(right, left.columns.toSet)
    pairs.join(l, "__ltid").join(r, "__rtid")
  }

  /** Incremental join update (§5.1, Fig. 3): joins only the `extra`
    * right tuples against the left part and unions with the existing
    * result — the second join of the plan after `clean_⋈` runs.
    */
  def incrementalJoin(existing: DataFrame, left: DataFrame, rightExtra: DataFrame,
                      leftKey: String, rightKey: String): DataFrame = {
    val add = probEquiJoin(left, rightExtra, leftKey, rightKey)
    val aligned = add.select(existing.columns.map(col): _*)
    existing.union(aligned)
      .dropDuplicates("__ltid", "__rtid")
  }

  private def renameRight(right: DataFrame, leftCols: Set[String]): DataFrame = {
    var r = right.withColumnRenamed(tidC, "__rtid")
      .withColumnRenamed(ProbData.ChkCol, "__rchk")
    for (c <- r.columns if leftCols.contains(c))
      r = r.withColumnRenamed(c, "r_" + c)
    r
  }
}

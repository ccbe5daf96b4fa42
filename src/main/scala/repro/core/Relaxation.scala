package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.ProbData.MaterializeOps

/** Query-result relaxation (§4.1, Algorithm 1).
  *
  * Given a query answer A over a dataset d and an FD `lhs → rhs`, the
  * relaxed result augments A with the *correlated tuples*: tuples
  * sharing an lhs value or an rhs value with the (growing) result,
  * iterated to a fixpoint (transitive closure). The correlated tuples
  * are exactly the context needed to compute the same candidate fixes
  * an offline cleaner would compute from the whole dataset.
  */
object Relaxation {

  /** Separator for multi-attribute lhs values. */
  val Sep = ""

  /** Outcome of Algorithm 1. */
  final case class Relaxed(
      /** tids of A ∪ total_extra. */
      tids: DataFrame,
      /** tids of total_extra only (the correlated tuples). */
      extraTids: DataFrame,
      iterations: Int,
      extraCount: Long)

  /** (tid, lv) — every candidate lhs value of every tuple; multi-attr
    * lhs values are concatenated with [[Sep]].
    */
  def lhsValues(state: DataFrame, fd: Fd): DataFrame = {
    var df = state.select(col(ProbData.TidCol) +:
      fd.lhs.zipWithIndex.map { case (a, i) => ProbData.valuesExpr(state, a).as(s"__a$i") }: _*)
    for (i <- fd.lhs.indices)
      df = df.withColumn(s"__e$i", explode(col(s"__a$i"))).drop(s"__a$i")
    df.select(col(ProbData.TidCol),
      concat_ws(Sep, fd.lhs.indices.map(i => col(s"__e$i")): _*).as("lv"))
  }

  /** (tid, rv) — every candidate rhs value of every tuple. */
  def rhsValues(state: DataFrame, fd: Fd): DataFrame =
    ProbData.explodeValues(state, fd.rhs, "rv")

  /** Algorithm 1. `answerTids` is a single-column DataFrame of the
    * tids of the dirty query answer A. Returns the relaxed result.
    *
    * `maxIter` bounds the transitive closure; Lemma 1 guarantees one
    * iteration suffices for filters on the rhs, filters on the lhs may
    * need more (Example 3).
    */
  def relax(state: DataFrame, answerTids: DataFrame, fd: Fd, maxIter: Int = 20): Relaxed = {
    val tidC = ProbData.TidCol
    val lv = lhsValues(state, fd).materialized
    val rv = rhsValues(state, fd).materialized

    var result = answerTids.select(col(answerTids.columns.head).as(tidC)).distinct()
      .materialized
    var unvisited = state.select(tidC).join(result, Seq(tidC), "left_anti")
      .materialized
    var totalExtra = 0L
    var extras: DataFrame = result.limit(0).materialized
    var iter = 0
    var done = false

    while (!done && iter < maxIter) {
      iter += 1
      // Lines 4-5: A_lhs / A_rhs from the result at iteration start —
      // the extra tuples found within the iteration do not feed its own
      // value sets (this is what keeps Example 2 at one iteration while
      // Example 3's lhs filter closes transitively across iterations).
      // The two filters of lines 6-10 fold into one semi-join pass:
      // extra = unvisited ⋉ (lhs ∈ A_lhs ∨ rhs ∈ A_rhs).
      val aLhs = lv.join(result, tidC).select("lv").distinct()
      val aRhs = rv.join(result, tidC).select("rv").distinct()
      val extra = unvisited.join(lv, tidC).join(aLhs, "lv").select(tidC)
        .union(unvisited.join(rv, tidC).join(aRhs, "rv").select(tidC))
        .distinct().materialized
      val n = extra.count()
      if (n > 0) {
        unvisited = unvisited.join(extra, Seq(tidC), "left_anti").materialized
        result = result.union(extra).materialized
        extras = extras.union(extra)
        totalExtra += n
      }
      done = n == 0
    }
    Relaxed(result, extras.distinct().materialized, iter, totalExtra)
  }

  // ---------------------------------------------------------------------
  // Lemma 2/3 estimates — used by tests and by the DC accuracy path.
  // ---------------------------------------------------------------------

  /** Lemma 2: hypergeometric probability that a relaxed result of size
    * `resultSize` drawn from `n` tuples containing `vio` violations
    * contains at least one violation — the probability an extra
    * iteration changes the fixes.
    */
  def probExtraViolation(n: Long, vio: Long, resultSize: Long): Double = {
    require(n > 0 && vio >= 0 && resultSize >= 0 && vio <= n && resultSize <= n)
    // Pr(0) = C(n - vio, |A_R|) / C(n, |A_R|) computed in log space.
    if (vio == 0) 0.0
    else if (resultSize > n - vio) 1.0
    else {
      val logPr0 = logC(n - vio, resultSize) - logC(n, resultSize)
      1.0 - math.exp(logPr0)
    }
  }

  private def logC(n: Long, k: Long): Double = {
    require(k <= n)
    var s = 0.0
    var i = 0L
    while (i < k) { s += math.log((n - i).toDouble) - math.log((k - i).toDouble); i += 1 }
    s
  }

  /** Lemma 3: upper bound of the relaxed-result growth in one
    * iteration: Σ_i (Σ_j D_ij − Σ_j Dq_ij) over the rule attributes,
    * where D/Dq are the value-frequency distributions of the dataset
    * and of the current result.
    */
  def upperBoundExtra(state: DataFrame, resultTids: DataFrame, ruleAttrs: Seq[String]): Long = {
    val tidC = ProbData.TidCol
    ruleAttrs.map { a =>
      val vals = ProbData.explodeValues(state, a)
      val resVals = vals.join(resultTids.select(col(resultTids.columns.head).as(tidC)), tidC)
      val distinctResVals = resVals.select("value").distinct()
      val dTotal  = vals.join(distinctResVals, "value").count()
      val dqTotal = resVals.count()
      math.max(0L, dTotal - dqTotal)
    }.sum
  }
}

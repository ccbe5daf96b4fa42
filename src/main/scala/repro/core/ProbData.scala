package repro.core

import org.apache.spark.sql.{Column, DataFrame, Row}
import org.apache.spark.sql.api.java.UDF2
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Attribute-level probabilistic representation (§4).
  *
  * Every attribute that participates in a rule gets a sidecar column
  * `attr__c : array<struct<v,op,p,w,n>>`:
  *
  *  - `v`  — candidate value (or numeric bound for range candidates),
  *  - `op` — "=" for a concrete candidate value, "<" / ">" for the
  *    open ranges produced by holistic DC repair (Example 5),
  *  - `p`  — frequency-based probability of the candidate (§4.1);
  *    candidates of one cell always sum to 1,
  *  - `w`  — the world/pair the candidate belongs to ("R": rhs-repair
  *    world keeping the lhs, "L": lhs-repair world keeping the rhs,
  *    "DC": holistic range fix) — the identifier the paper stores
  *    inside each candidate value,
  *  - `n`  — support count (number of correlated tuples / violating
  *    pairs backing the candidate), used to merge candidate sets of
  *    multiple rules by union (§4.3, Lemma 4).
  *
  * An empty/null sidecar means the cell is clean and its value lives
  * in the base column. When a cell becomes probabilistic the base
  * column *keeps the original value* — that is the provenance the
  * paper maintains to merge newly-arriving rules (§4, Table 7).
  *
  * `__chk : array<string>` records the rule ids that already checked a
  * tuple, so later queries skip it (§4.3 "Daisy maintains information
  * about the already checked tuples by each rule").
  */
object ProbData {

  val TidCol  = "__tid"
  val ChkCol  = "__chk"

  /** Eager, stats-free materialization — used instead of
    * `localCheckpoint(true)` everywhere (see
    * [[org.apache.spark.sql.ReproCheckpoint]] for why inherited
    * statistics must be dropped).
    */
  implicit final class MaterializeOps(private val df: DataFrame) extends AnyVal {
    def materialized: DataFrame = org.apache.spark.sql.ReproCheckpoint.statsFree(df)
  }

  val CandStruct: StructType = StructType(Seq(
    StructField("v", StringType),
    StructField("op", StringType),
    StructField("p", DoubleType),
    StructField("w", StringType),
    StructField("n", LongType),
  ))
  val CandType: ArrayType = ArrayType(CandStruct)

  /** Name of the candidate sidecar column of `attr`. */
  def candCol(attr: String): String = attr + "__c"

  /** True iff `df` carries a candidate sidecar for `attr`. */
  def hasCands(df: DataFrame, attr: String): Boolean =
    df.columns.contains(candCol(attr))

  /** Lifts a plain relation into Daisy's state representation: casts
    * every rule attribute to string, adds a stable `__tid` (from an
    * existing `tid` column or via a deterministic row numbering), empty
    * candidate sidecars for every rule attribute and an empty `__chk`.
    */
  def init(df: DataFrame, rules: Seq[Rule]): DataFrame = {
    val ruleAttrs = rules.flatMap(_.attrs).distinct.filter(df.columns.contains)
    var out = df
    if (!out.columns.contains(TidCol)) {
      // Deterministic in the input ordering of a generated dataset:
      // generators emit an `id`-like column; otherwise fall back to a
      // sort over all columns to keep ids stable across recomputation.
      out = out.withColumn(TidCol, monotonically_increasing_id())
    }
    for (a <- ruleAttrs)
      out = out.withColumn(a, col(a).cast(StringType))
        .withColumn(candCol(a), lit(null).cast(CandType))
    out.withColumn(ChkCol, array().cast(ArrayType(StringType)))
  }

  /** Column of candidate *equality* values of `attr` as an array —
    * the base value for clean cells, the candidate `v`s for dirty ones
    * (range candidates carry no enumerable value and are excluded).
    */
  def valuesExpr(df: DataFrame, attr: String): Column = {
    val c = col(candCol(attr))
    if (!hasCands(df, attr)) array(col(attr).cast(StringType))
    else when(c.isNull || size(c) === 0, array(col(attr).cast(StringType)))
      .otherwise(transform(filter(c, x => x.getField("op") === "="), x => x.getField("v")))
  }

  /** (tid, value) pairs, one row per candidate value of `attr`. */
  def explodeValues(df: DataFrame, attr: String, as: String = "value"): DataFrame =
    df.select(col(TidCol), explode(valuesExpr(df, attr)).as(as))

  /** Probabilistic qualification of a predicate (§4): a tuple
    * qualifies iff its clean value satisfies the predicate or at least
    * one candidate does.
    */
  def qualifies(df: DataFrame, pred: Pred): Column = {
    val base = pred.onValue(col(pred.attr))
    if (!hasCands(df, pred.attr)) base
    else {
      val c = col(candCol(pred.attr))
      when(c.isNull || size(c) === 0, base)
        .otherwise(exists(c, x => pred.onCandidate(x)))
    }
  }

  /** Conjunction of [[qualifies]] over `preds` (true when empty). */
  def qualifiesAll(df: DataFrame, preds: Seq[Pred]): Column =
    preds.map(qualifies(df, _)).foldLeft(lit(true))(_ && _)

  /** True iff the cell of `attr` is probabilistic. */
  def isDirty(attr: String): Column = {
    val c = col(candCol(attr))
    c.isNotNull && size(c) > 0
  }

  /** Merges two candidate sets by value union: supports (`n`) add up
    * and probabilities are recomputed as n/Σn (§4.3 — P(X|Y∪Z)).
    * Commutative and associative (Lemma 4). Null-tolerant: merging
    * with a clean side returns the other side unchanged.
    */
  private val mergeUdf2 = new UDF2[Seq[Row], Seq[Row], Seq[Row]] {
    override def call(a: Seq[Row], b: Seq[Row]): Seq[Row] = mergeCandSeqs(a, b)
  }

  private[core] def mergeCandSeqs(a: Seq[Row], b: Seq[Row]): Seq[Row] = {
    val xs = (Option(a).getOrElse(Nil) ++ Option(b).getOrElse(Nil))
    if (xs.isEmpty) null
    else {
      val grouped = xs.groupBy(r => (r.getString(0), r.getString(1))).toSeq
        .map { case ((v, op), rs) =>
          (v, op, rs.map(_.getLong(4)).sum, rs.map(_.getString(3)).distinct.sorted.mkString("+"))
        }
      val total = grouped.map(_._3).sum.toDouble.max(1.0)
      grouped.sortBy { case (v, op, _, _) => (op, v) }
        .map { case (v, op, n, w) => Row(v, op, n / total, w, n) }
    }
  }

  val mergeCands: org.apache.spark.sql.expressions.UserDefinedFunction =
    udf(mergeUdf2, CandType)

  /** Canonical form for assertions: candidates sorted, probabilities
    * rounded — lets tests compare candidate sets deterministically.
    */
  def canonCands(df: DataFrame, attr: String): DataFrame = {
    val c = col(candCol(attr))
    df.withColumn(candCol(attr),
      when(c.isNull, c).otherwise(
        array_sort(transform(c, x => struct(
          x.getField("v").as("v"), x.getField("op").as("op"),
          round(x.getField("p"), 4).as("p"), x.getField("w").as("w"),
          x.getField("n").as("n"))))))
  }

  /** Renders a candidate set as a compact string such as
    * "Los Angeles@0.67|San Francisco@0.33" — used by tests and by the
    * probabilistic dataset export.
    */
  def candsToString(attr: String): Column = {
    val c = col(candCol(attr))
    when(c.isNull || size(c) === 0, col(attr).cast(StringType)).otherwise(
      array_join(
        transform(array_sort(c), x =>
          concat(
            when(x.getField("op") === "=", x.getField("v"))
              .otherwise(concat(x.getField("op"), x.getField("v"))),
            lit("@"), format_number(x.getField("p"), 2))),
        "|"))
  }

  /** Marks `ruleId` as checked on the rows whose tid appears in
    * `tids` (a single-column DataFrame of tuple ids).
    */
  def markChecked(state: DataFrame, tids: DataFrame, ruleId: String): DataFrame = {
    val t = tids.toDF(TidCol).distinct().withColumn("__hit", lit(true))
    state.join(t, Seq(TidCol), "left")
      .withColumn(ChkCol,
        when(col("__hit"), array_union(col(ChkCol), array(lit(ruleId))))
          .otherwise(col(ChkCol)))
      .drop("__hit")
  }

  /** True for tuples already checked by `ruleId`. */
  def checkedBy(ruleId: String): Column = array_contains(col(ChkCol), ruleId)
}

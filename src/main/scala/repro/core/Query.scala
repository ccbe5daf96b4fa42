package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Query model matching the paper's supported template (§5):
  *
  * {{{
  * SELECT <selectlist>
  * FROM   <table> [, <table> (...)]
  * [WHERE <col><op><val> [(AND/OR <col><op><val>)]]
  * [GROUP BY <cols> with aggregates]
  * }}}
  *
  * `op` ∈ {=, ≠, <, ≤, >, ≥}; joins are equi-joins. The AST below is
  * interpreted by [[Planner]]/[[Daisy]] into DataFrame operations; the
  * relational pieces run through Catalyst unchanged, while cleaning
  * operators are woven in between them.
  */
final case class Pred(attr: String, op: String, value: String) {
  require(Pred.Ops.contains(op), s"unsupported predicate op '$op'")

  private def isNumericCompare: Boolean = op != "=" && op != "!="

  /** Predicate over a deterministic (string-typed) column value. */
  def onValue(c: Column): Column = {
    if (isNumericCompare) {
      val l = c.cast("double"); val r = lit(value.toDouble)
      op match {
        case "<"  => l < r
        case "<=" => l <= r
        case ">"  => l > r
        case ">=" => l >= r
      }
    } else if (op == "=") c === lit(value)
    else c =!= lit(value)
  }

  /** Predicate over one candidate struct (fields v, op, p, w, n).
    * Equality candidates (`op = "="`) are tested directly; range
    * candidates ("<b" / ">b", produced by holistic DC repair) qualify
    * iff the candidate interval intersects the predicate interval
    * (§4.2: a tuple qualifies iff at least one candidate qualifies).
    */
  def onCandidate(cand: Column): Column = {
    val cv  = cand.getField("v")
    val cop = cand.getField("op")
    val eqCase = onValue(cv)
    if (!isNumericCompare) {
      // Range candidates intersect any =/!= predicate over numbers only
      // when the bound allows it; for simplicity a range candidate
      // qualifies an equality pred iff the pred value lies in the range.
      val pv = lit(value).cast("double")
      val rangeCase = (cop === "<" && pv < cv.cast("double")) ||
        (cop === ">" && pv > cv.cast("double"))
      when(cop === "=", eqCase).otherwise(if (op == "=") rangeCase else lit(true))
    } else {
      val b  = cv.cast("double")
      val qv = lit(value.toDouble)
      // candidate interval: op "<" ⇒ (-inf, b); ">" ⇒ (b, +inf)
      val rangeCase = op match {
        case "<" | "<=" => when(cop === "<", lit(true)).otherwise(qv > b)
        case ">" | ">=" => when(cop === ">", lit(true)).otherwise(qv < b)
      }
      when(cop === "=", eqCase).otherwise(rangeCase)
    }
  }
}

object Pred {
  val Ops: Set[String] = Set("=", "!=", "<", "<=", ">", ">=")
}

/** Equi-join with another table of the Daisy session. */
final case class JoinSpec(rightTable: String, leftKey: String, rightKey: String,
                          rightWhere: Seq[Pred] = Nil)

/** Aggregate `func(col) AS alias`; func ∈ {sum, avg, min, max, count}. */
final case class Agg(func: String, col: String, alias: String) {
  require(Seq("sum", "avg", "min", "max", "count").contains(func),
    s"unsupported aggregate '$func'")
}

/** One query of the workload. `where` is a conjunction (the paper's OR
  * is expressible as separate queries and is not needed by any table).
  */
final case class QuerySpec(
    table: String,
    where: Seq[Pred]      = Nil,
    select: Seq[String]   = Nil,
    join: Option[JoinSpec] = None,
    groupBy: Seq[String]  = Nil,
    aggs: Seq[Agg]        = Nil,
) {
  /** P ∪ W of §4.1 for the left table: attributes the query accesses. */
  def accessedAttrs: Seq[String] =
    (select ++ where.map(_.attr) ++ join.map(_.leftKey).toSeq ++ groupBy ++
      aggs.map(_.col)).distinct

  /** Accessed attributes of the joined (right) table, if any. */
  def rightAccessedAttrs: Seq[String] =
    join.toSeq.flatMap(j => j.rightKey +: j.rightWhere.map(_.attr)).distinct
}

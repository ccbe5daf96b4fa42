package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Cleaning-aware planning (§5.1) — pure, no Spark needed. */
class PlannerSpec extends AnyFunSuite {

  private val fd  = Fd("phi", "zip", "city")
  private val psi = Fd("psi", "addr", "suppkey")
  private val rules = Map("r" -> Seq(fd), "s" -> Seq(psi)).withDefaultValue(Seq.empty[Rule])

  test("a rule overlapping the where clause injects clean_σ") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("city", "=", "LA"))), rules)
    assert(p.steps.map(_.rule.id) == Seq("phi"))
    assert(p.operatorOrder.contains("clean_σ[phi]"))
  }

  test("a rule overlapping only the projection still injects clean_σ (§4.1 overlap)") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("other", "=", "x")),
      select = Seq("zip")), rules)
    assert(p.steps.map(_.rule.id) == Seq("phi"))
  }

  test("no overlap, no cleaning operator") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("other", "=", "x")),
      select = Seq("other")), rules)
    assert(p.steps.isEmpty)
    assert(!p.operatorOrder.exists(_.startsWith("clean")))
  }

  test("incremental placement puts clean_σ after the filter") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("city", "=", "LA"))), rules)
    val o = p.operatorOrder
    assert(o.indexOf("filter(city)") < o.indexOf("clean_σ[phi]"))
  }

  test("a switched rule is pushed before the filter (full cleaning of the relation)") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("city", "=", "LA"))), rules,
      switchedToFull = (_, r) => r.id == "phi")
    val o = p.operatorOrder
    assert(o.indexOf("clean_σ[phi]") < o.indexOf("filter(city)"))
    assert(p.steps.head.placement == Planner.BeforeFilter)
  }

  test("join side rules become clean_⋈ followed by the incremental join") {
    val q = QuerySpec("r", where = Seq(Pred("city", "=", "LA")),
      join = Some(JoinSpec("s", "zip", "suppkey")))
    val p = Planner.plan(q, rules)
    val o = p.operatorOrder
    assert(p.steps.exists(s => s.isJoinSide && s.rule.id == "psi"))
    assert(o.indexOf("join(r.zip=s.suppkey)") < o.indexOf("clean_⋈[psi]"))
    assert(o.indexOf("clean_⋈[psi]") < o.indexOf("incremental-join"))
  }

  test("cleaning is pushed below the group-by") {
    val q = QuerySpec("r", where = Seq(Pred("zip", "=", "1")),
      groupBy = Seq("city"), aggs = Seq(Agg("count", "zip", "n")))
    val p = Planner.plan(q, rules)
    val o = p.operatorOrder
    assert(o.indexOf("clean_σ[phi]") < o.indexOf("groupBy(city)"))
  }

  test("join key participating in a left-table rule triggers the left clean_σ") {
    val q = QuerySpec("r", join = Some(JoinSpec("s", "zip", "suppkey")))
    val p = Planner.plan(q, rules)
    assert(p.steps.exists(s => !s.isJoinSide && s.rule.id == "phi"))
  }

  test("operator order always starts with the scan and ends with projection when present") {
    val p = Planner.plan(QuerySpec("r", where = Seq(Pred("city", "=", "LA")),
      select = Seq("zip")), rules)
    assert(p.operatorOrder.head == "scan(r)")
    assert(p.operatorOrder.last == "project(zip)")
  }

  test("rule overlap definition matches §4.1: (X ∪ Y) ∩ (P ∪ W) ≠ ∅") {
    assert(fd.overlaps(Seq("zip")))
    assert(fd.overlaps(Seq("city", "unrelated")))
    assert(!fd.overlaps(Seq("unrelated")))
  }
}

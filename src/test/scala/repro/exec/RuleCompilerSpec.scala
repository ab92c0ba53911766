package repro.exec

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestKit}
import repro.core._

/** The rule-execution building blocks, each checked against the DuckDB
  * oracle where a result set is produced — a wrong join plan must fail
  * here, not just "run".
  */
class RuleCompilerSpec extends SparkSpec {

  private def store(progText: String, factsText: String) = {
    val (p, d) = TestKit.program(progText)
    (p, FactStore.fromFacts(spark, p, TestKit.facts(factsText, d)))
  }

  test("bindings of a two-atom join match DuckDB") {
    val (p, st) = store("P(X,Z) :- e(X,Y), f(Y,Z)",
      "e(1,2)\ne(2,3)\ne(4,5)\nf(2,7)\nf(3,8)\nf(9,9)")
    val binds = RuleCompiler.bindings(p.rules.head, i => st(p.rules.head.body(i).pred))
    Oracle.assertEquivalent(binds,
      "SELECT e.c0 AS v_X, e.c1 AS v_Y, f.c1 AS v_Z FROM e, f WHERE e.c1 = f.c0",
      "e" -> st("e"), "f" -> st("f"))
  }

  test("bindings with a constant in the body match DuckDB") {
    val (p, st) = store("P(X) :- t(X, 42)", "t(1,42)\nt(2,7)\nt(3,42)")
    val binds = RuleCompiler.bindings(p.rules.head, i => st(p.rules.head.body(i).pred))
    Oracle.assertEquivalent(binds,
      "SELECT c0 AS v_X FROM t WHERE c1 = '42'", "t" -> st("t"))
  }

  test("bindings with repeated variables in one atom match DuckDB") {
    val (p, st) = store("P(X) :- e(X, X)", "e(1,1)\ne(1,2)\ne(3,3)")
    val binds = RuleCompiler.bindings(p.rules.head, i => st(p.rules.head.body(i).pred))
    Oracle.assertEquivalent(binds,
      "SELECT c0 AS v_X FROM e WHERE c0 = c1", "e" -> st("e"))
  }

  test("bindings of a three-atom chain match DuckDB") {
    val (p, st) = store("P(X,W) :- e(X,Y), e(Y,Z), e(Z,W)",
      "e(1,2)\ne(2,3)\ne(3,4)\ne(4,5)\ne(2,9)")
    val r = p.rules.head
    val binds = RuleCompiler.bindings(r, i => st(r.body(i).pred))
    Oracle.assertEquivalent(binds,
      """SELECT a.c0 AS v_X, a.c1 AS v_Y, b.c1 AS v_Z, c.c1 AS v_W
         FROM e a, e b, e c WHERE a.c1 = b.c0 AND b.c1 = c.c0""",
      "e" -> st("e"))
  }

  test("disconnected body atoms produce a cross join") {
    val (p, st) = store("P(X,Y) :- a(X), b(Y)", "a(1)\na(2)\nb(7)\nb(8)")
    val r = p.rules.head
    val binds = RuleCompiler.bindings(r, i => st(r.body(i).pred))
    Oracle.assertEquivalent(binds,
      "SELECT a.c0 AS v_X, b.c0 AS v_Y FROM a, b", "a" -> st("a"), "b" -> st("b"))
  }

  test("all-constant guard atom keeps or kills the bindings") {
    val (p, st) = store("P(X) :- a(X), flag(1)", "a(5)\nflag(1)")
    val r = p.rules.head
    val binds = RuleCompiler.bindings(r, i => st(r.body(i).pred))
    assert(binds.select("v_X").collect().map(_.getLong(0)).toSeq == Seq(5L))
    val (p2, st2) = store("P(X) :- a(X), flag(1)", "a(5)\nflag(2)")
    val binds2 = RuleCompiler.bindings(p2.rules.head, i => st2(p2.rules.head.body(i).pred))
    assert(binds2.count() == 0)
  }

  test("projectHead maps frontier variables and constants") {
    val (p, st) = store("P(Y, X, 9) :- e(X,Y)", "e(1,2)")
    val r = p.rules.head
    val out = RuleCompiler.projectHead(r, RuleCompiler.bindings(r, i => st(r.body(i).pred)), 0)
    assert(out.collect().map(x => (x.getLong(0), x.getLong(1), x.getLong(2))).toSeq ==
      Seq((2L, 1L, 9L)))
  }

  test("projectHead Skolem nulls are negative, functional, and salt-sensitive") {
    val (p, st) = store("P(X,Z) :- a(X)", "a(1)\na(2)")
    val r = p.rules.head
    val b = RuleCompiler.bindings(r, i => st(r.body(i).pred))
    val o1 = RuleCompiler.projectHead(r, b, 7).collect().map(x => (x.getLong(0), x.getLong(1))).toMap
    val o2 = RuleCompiler.projectHead(r, b, 7).collect().map(x => (x.getLong(0), x.getLong(1))).toMap
    val o3 = RuleCompiler.projectHead(r, b, 8).collect().map(x => (x.getLong(0), x.getLong(1))).toMap
    assert(o1.values.forall(_ < 0))
    assert(o1 == o2)                       // deterministic
    assert(o1(1L) != o1(2L))               // frontier-sensitive
    assert(o1(1L) != o3(1L))               // salt-sensitive
  }

  test("filterUnsatisfied drops bindings whose head is satisfied (frontier match)") {
    // q(X) -> ∃Z P(X,Z); P(1,*) exists, P(2,*) does not
    val (p, _) = TestKit.program("P(X,Z) :- q(X)")
    val r = p.rules.head
    val st = FactStore.fromFacts(spark, p, Seq(
      Fact("q", Vector(1L)), Fact("q", Vector(2L)), Fact("P", Vector(1L, 77L))))
    val binds = RuleCompiler.bindings(r, i => st(r.body(i).pred))
    val kept = RuleCompiler.filterUnsatisfied(r, binds, st("P"))
    assert(kept.select("v_X").collect().map(_.getLong(0)).toSeq == Seq(2L))
  }

  test("filterUnsatisfied honours repeated existential variables") {
    // q(X) -> ∃Z P(X,Z,Z): only facts with equal 2nd/3rd args satisfy it
    val (p, _) = TestKit.program("P(X,Z,Z) :- q(X)")
    val r = p.rules.head
    val st = FactStore.fromFacts(spark, p, Seq(
      Fact("q", Vector(1L)), Fact("q", Vector(2L)),
      Fact("P", Vector(1L, 5L, 5L)), Fact("P", Vector(2L, 5L, 6L))))
    val kept = RuleCompiler.filterUnsatisfied(r, binds = RuleCompiler.bindings(
      r, i => st(r.body(i).pred)), headExtent = st("P"))
    assert(kept.select("v_X").collect().map(_.getLong(0)).toSeq == Seq(2L))
  }

  test("filterUnsatisfied with Datalog head is exact membership") {
    val (p, _) = TestKit.program("P(X) :- q(X)")
    val r = p.rules.head
    val st = FactStore.fromFacts(spark, p, Seq(
      Fact("q", Vector(1L)), Fact("q", Vector(2L)), Fact("P", Vector(1L))))
    val kept = RuleCompiler.filterUnsatisfied(r, RuleCompiler.bindings(
      r, i => st(r.body(i).pred)), st("P"))
    assert(kept.select("v_X").collect().map(_.getLong(0)).toSeq == Seq(2L))
  }

  test("newFacts = distinct(derived) minus existing, via DuckDB") {
    val (p, st) = store("P(X) :- a(X)", "a(1)\na(2)\na(3)\nP(2)")
    val derived = st("a").toDF("c0").unionByName(st("a").toDF("c0"))
    val out = RuleCompiler.newFacts(derived, st("P"))
    Oracle.assertEquivalent(out,
      "SELECT DISTINCT c0 FROM a WHERE c0 NOT IN (SELECT c0 FROM P)",
      "a" -> st("a"), "P" -> st("P"))
  }

  test("atomBindings projects each variable once") {
    val (p, st) = store("P(X,Y) :- e(X,Y)", "e(1,2)")
    val df = RuleCompiler.atomBindings(Atom("e",
      Vector(Var("A"), Var("A"))), st("e"), "0")
    assert(df.columns.toSeq == Seq("v_A"))
  }
}

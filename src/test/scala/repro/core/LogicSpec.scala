package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit

class LogicSpec extends AnyFunSuite {

  private val (p1, _) = TestKit.program(TestKit.p1Text)

  test("Cst distinguishes constants from nulls by sign") {
    assert(!Cst(0).isNull); assert(!Cst(42).isNull); assert(Cst(-1).isNull)
  }

  test("Atom arity and variables") {
    val a = Atom("T", Vector(Var("Y"), Var("X"), Var("Y")))
    assert(a.arity == 3)
    assert(a.vars == Vector(Var("Y"), Var("X"), Var("Y")))
    assert(a.varSet == Set(Var("X"), Var("Y")))
    assert(!a.isGround)
    assert(Atom("p", Vector(Cst(1), Cst(2))).isGround)
  }

  test("Fact.fromAtom requires ground atoms") {
    assert(Fact.fromAtom(Atom("p", Vector(Cst(1)))) == Fact("p", Vector(1L)))
    intercept[RuntimeException](Fact.fromAtom(Atom("p", Vector(Var("X")))))
  }

  test("Rule frontier and existentials (r4 of Example 1)") {
    val r4 = p1.rules(3) // T(Y,X,Z) :- r(X,Y)
    assert(r4.frontier.toSet == Set(Var("X"), Var("Y")))
    assert(r4.existentials == Vector(Var("Z")))
    assert(!r4.isDatalog)
    assert(r4.isLinear)
  }

  test("Datalog rules have no existentials") {
    assert(p1.rules(0).isDatalog && p1.rules(1).isDatalog && p1.rules(2).isDatalog)
  }

  test("Program EDB/IDB split: head predicates are IDB") {
    assert(p1.idbPreds == Set("R", "T"))
    assert(p1.edbPreds == Set("r"))
  }

  test("Program arities are collected and checked") {
    assert(p1.arities == Map("r" -> 2, "R" -> 2, "T" -> 3))
    val bad = "P(X) :- q(X)\nP(X,Y) :- q(Y)"
    intercept[IllegalArgumentException](TestKit.program(bad)._1.arities)
  }

  test("P1 is linear but not Datalog") {
    assert(p1.isLinear); assert(!p1.isDatalog)
  }

  test("extensionalRules are the rules with EDB-only bodies") {
    assert(p1.extensionalRules.map(_.id).toSet == Set(0, 3))
  }

  test("Program.apply assigns consecutive ids") {
    val p = Program(Seq(
      (Vector(Atom("a", Vector(Var("X")))), Atom("B", Vector(Var("X")))),
      (Vector(Atom("B", Vector(Var("X")))), Atom("C", Vector(Var("X"))))))
    assert(p.rules.map(_.id) == Vector(0, 1))
  }

  test("TermDict interning is stable and bijective") {
    val d = new TermDict
    val a = d.intern("alice"); val b = d.intern("bob")
    assert(a != b)
    assert(d.intern("alice") == a)
    assert(d.name(a) == "alice" && d.name(b) == "bob")
    assert(d.name(-5) == "_:n5")
  }

  test("empty body is rejected") {
    intercept[IllegalArgumentException](
      Rule(0, Vector.empty, Atom("P", Vector(Var("X")))))
  }
}

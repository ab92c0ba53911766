package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ParserSpec extends AnyFunSuite {
  private def dict = new TermDict

  test("atoms: uppercase tokens are variables") {
    val a = DatalogParser.parseAtom("R(X, Y)", dict)
    assert(a == Atom("R", Vector(Var("X"), Var("Y"))))
  }

  test("atoms: lowercase tokens are interned constants") {
    val d = dict
    val a = DatalogParser.parseAtom("type(X, person)", d)
    assert(a.pred == "type")
    assert(a.terms(1) == Cst(d.intern("person")))
  }

  test("atoms: numeric tokens are literal Long constants") {
    val a = DatalogParser.parseAtom("t(X, 42, Y)", dict)
    assert(a.terms(1) == Cst(42))
  }

  test("nullary atoms parse") {
    assert(DatalogParser.parseAtom("Q()", dict) == Atom("Q", Vector.empty))
  }

  test("rules split head and body, trailing dot optional") {
    val r = DatalogParser.parseRule("P(X,Z) :- a(X,Y), b(Y,Z).", 7, dict)
    assert(r.id == 7)
    assert(r.body.map(_.pred) == Vector("a", "b"))
    assert(r.head == Atom("P", Vector(Var("X"), Var("Z"))))
  }

  test("body commas inside parens do not split atoms") {
    val r = DatalogParser.parseRule("P(X) :- a(X,Y), b(Y,X)", 0, dict)
    assert(r.body.size == 2)
  }

  test("programs skip comments and blank lines") {
    val p = DatalogParser.parse(
      """
      % a comment
      P(X) :- a(X)   % trailing comment

      Q(X) :- P(X)
      """, dict)
    assert(p.rules.size == 2)
    assert(p.rules.map(_.id) == Vector(0, 1))
  }

  test("existential variables are detected from the head") {
    val r = DatalogParser.parseRule("T(Y,X,Z) :- r(X,Y)", 0, dict)
    assert(r.existentials == Vector(Var("Z")))
  }

  test("parseFacts builds ground facts through the dict") {
    val d = dict
    val fs = DatalogParser.parseFacts("r(a, b)\nr(c, c)", d)
    assert(fs.size == 2)
    assert(fs(0) == Fact("r", Vector(d.intern("a"), d.intern("b"))))
    assert(fs(1).args(0) == fs(1).args(1))
  }

  test("malformed rules are rejected") {
    intercept[IllegalArgumentException](
      DatalogParser.parseRule("P(X) a(X)", 0, dict))
  }

  test("malformed atoms are rejected") {
    intercept[RuntimeException](DatalogParser.parseAtom("nope", dict))
  }

  test("same dict shares constants across rules and facts") {
    val d = dict
    val p = DatalogParser.parse("P(X) :- t(X, special)", d)
    val f = DatalogParser.parseFacts("t(e1, special)", d)
    val ruleCst = p.rules.head.body.head.terms(1)
    assert(ruleCst == Cst(f.head.args(1)))
  }
}

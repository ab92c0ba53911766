package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit

class RefEvaluatorSpec extends AnyFunSuite {

  test("transitive closure over a chain") {
    val (p, d) = TestKit.program("E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)")
    val base = TestKit.instance("e(1,2)\ne(2,3)\ne(3,4)", d)
    val r = RefEvaluator.chase(p, base)
    assert(r.instance("E").size == 6) // all i<j pairs
    assert(r.instance("E").contains(Vector(1L, 4L)))
  }

  test("Example 1: restricted chase derives R(c1,c2), T(c2,c1,n), T(c2,c1,c2)") {
    val (p, d) = TestKit.program(TestKit.p1Text)
    val base = TestKit.instance("r(1,2)", d)
    val r = RefEvaluator.chase(p, base, RefEvaluator.Restricted)
    assert(r.instance("R") == Set(Vector(1L, 2L)))
    val ts = r.instance("T")
    assert(ts.exists(t => t == Vector(2L, 1L, 2L)))
    // the logically redundant fact T(c2,c1,n1) is still derived by the chase
    assert(ts.exists(t => t(2) < 0))
    assert(ts.size == 2)
  }

  test("Example 1: Skolem chase agrees up to null naming") {
    val (p, d) = TestKit.program(TestKit.p1Text)
    val base = TestKit.instance("r(1,2)", d)
    val restricted = RefEvaluator.chase(p, base, RefEvaluator.Restricted)
    val skolem = RefEvaluator.chase(p, base, RefEvaluator.Skolem)
    TestKit.assertEquiv(restricted.instance, skolem.instance)
  }

  test("restricted chase blocks satisfied existential heads") {
    // head already satisfiable: q(X) -> ∃Y p(X,Y), with p(1,2) given
    val (p, d) = TestKit.program("P(X,Y) :- p(X,Y)\nP(X,Z) :- q(X)")
    val base = TestKit.instance("p(1,2)\nq(1)", d)
    val r = RefEvaluator.chase(p, base, RefEvaluator.Restricted)
    assert(r.instance("P") == Set(Vector(1L, 2L))) // no null introduced
  }

  test("Skolem chase does introduce the null in the same situation") {
    val (p, d) = TestKit.program("P(X,Y) :- p(X,Y)\nP(X,Z) :- q(X)")
    val base = TestKit.instance("p(1,2)\nq(1)", d)
    val r = RefEvaluator.chase(p, base, RefEvaluator.Skolem)
    assert(r.instance("P").size == 2)
    assert(r.instance("P").exists(_.exists(_ < 0)))
  }

  test("skolemNull is functional in (rule, idx, frontier) and negative") {
    val a = RefEvaluator.skolemNull(3, 0, Seq(1L, 2L))
    assert(a < 0)
    assert(a == RefEvaluator.skolemNull(3, 0, Seq(1L, 2L)))
    assert(a != RefEvaluator.skolemNull(3, 1, Seq(1L, 2L)))
    assert(a != RefEvaluator.skolemNull(4, 0, Seq(1L, 2L)))
    assert(a != RefEvaluator.skolemNull(3, 0, Seq(2L, 1L)))
  }

  test("triggers are counted") {
    val (p, d) = TestKit.program("A(X) :- a(X)")
    val base = TestKit.instance("a(1)\na(2)", d)
    val r = RefEvaluator.chase(p, base)
    assert(r.triggers >= 2)
  }

  test("non-terminating Skolem chase hits the round guard") {
    // r(1,1): R(1,1) -> R(1,sk) -> R(sk,sk') -> ... diverges under Skolem
    val (p, d) = TestKit.program("R(X,Y) :- r(X,Y)\nR(Y,Z) :- R(X,Y)")
    val base = TestKit.instance("r(1,1)", d)
    intercept[IllegalArgumentException](
      RefEvaluator.chase(p, base, RefEvaluator.Skolem, maxRounds = 20))
  }

  test("restricted chase terminates on the same program") {
    val (p, d) = TestKit.program("R(X,Y) :- r(X,Y)\nR(Y,Z) :- R(X,Y)")
    val base = TestKit.instance("r(1,1)", d)
    val r = RefEvaluator.chase(p, base, RefEvaluator.Restricted, maxRounds = 50)
    // head R(1,Z) is satisfied by R(1,1) itself, so nothing new is derived
    assert(r.instance("R") == Set(Vector(1L, 1L)))
  }

  test("idbFacts counts only IDB predicates") {
    val (p, d) = TestKit.program("A(X) :- a(X)")
    val base = TestKit.instance("a(1)\na(2)\na(3)", d)
    val r = RefEvaluator.chase(p, base)
    assert(r.idbFacts(p) == 3)
  }

  test("constants in rule bodies filter") {
    val (p, d) = TestKit.program("Special(X) :- t(X, 42)")
    val base = TestKit.instance("t(1,42)\nt(2,7)", d)
    val r = RefEvaluator.chase(p, base)
    assert(r.instance("Special") == Set(Vector(1L)))
  }

  test("constants in rule heads are emitted") {
    val (p, d) = TestKit.program("Tagged(X, 9) :- a(X)")
    val base = TestKit.instance("a(5)", d)
    val r = RefEvaluator.chase(p, base)
    assert(r.instance("Tagged") == Set(Vector(5L, 9L)))
  }
}

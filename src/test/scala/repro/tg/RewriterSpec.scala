package repro.tg

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core._

class RewriterSpec extends AnyFunSuite {

  private def freshGen(): () => String = {
    var i = 0
    () => { i += 1; s"W$i" }
  }

  // ---- Unify ----

  test("mgu of identical atoms is empty-compatible") {
    val a = Atom("R", Vector(Var("X"), Var("Y")))
    assert(Unify.mgu(a, a).contains(Map.empty))
  }

  test("mgu binds variables to constants") {
    val s = Unify.mgu(Atom("R", Vector(Var("X"), Cst(3))),
                      Atom("R", Vector(Cst(2), Var("Y")))).get
    assert(Unify(s, Var("X")) == Cst(2))
    assert(Unify(s, Var("Y")) == Cst(3))
  }

  test("mgu fails on constant clash or predicate mismatch") {
    assert(Unify.mgu(Atom("R", Vector(Cst(1))), Atom("R", Vector(Cst(2)))).isEmpty)
    assert(Unify.mgu(Atom("R", Vector(Var("X"))), Atom("S", Vector(Var("X")))).isEmpty)
  }

  test("mgu chains variable-variable bindings") {
    val s = Unify.mgu(Atom("R", Vector(Var("X"), Var("X"))),
                      Atom("R", Vector(Var("A"), Cst(5)))).get
    assert(Unify(s, Var("X")) == Cst(5))
    assert(Unify(s, Var("A")) == Cst(5))
  }

  // ---- Rewriter (Example 43) ----

  test("Example 43: rew(u2) unfolds to Q(Y2,Z2) <- r(Y2,Z2,Z1)") {
    val (p, _) = TestKit.program(
      "T(X1,X1,Y1) :- r(X1,Y1,Z1)\nR(Y2,Z2) :- T(X2,Y2,Z2)")
    val u1 = TGNode(0, p.rules(0), Vector(None))
    val u2 = TGNode(1, p.rules(1), Vector(Some(0)))
    val rewU1 = Rewriter.rewrite(u1, _ => sys.error("no parents"), 48, freshGen())
    val rewU2 = Rewriter.rewrite(u2, Map(0 -> rewU1), 48, freshGen())
    val Rewriter.Ok(cq) = rewU2
    assert(cq.body.size == 1)
    assert(cq.body.head.pred == "r")
    // head vars are positions 0 and 1 of the r-atom; position 2 is free
    val Vector(h0, h1) = cq.head.terms
    assert(cq.body.head.terms(0) == h0)
    assert(cq.body.head.terms(1) == h1)
    assert(cq.body.head.terms(2) != h0 && cq.body.head.terms(2) != h1)
  }

  test("rewriting an extensional node is its own rule") {
    val (p, _) = TestKit.program("B(X) :- a(X,Y)")
    val n = TGNode(0, p.rules(0), Vector(None))
    val Rewriter.Ok(cq) = Rewriter.rewrite(n, _ => sys.error("-"), 48, freshGen())
    assert(cq.body.map(_.pred) == Vector("a"))
    assert(cq.head.pred == "B")
  }

  test("rewriting expands multi-atom bodies through parents") {
    val (p, _) = TestKit.program(
      "B(X) :- a(X)\nC(X) :- b(X)\nD(X) :- B(X), C(X)")
    val nb = TGNode(0, p.rules(0), Vector(None))
    val nc = TGNode(1, p.rules(1), Vector(None))
    val nd = TGNode(2, p.rules(2), Vector(Some(0), Some(1)))
    val rews = scala.collection.mutable.Map.empty[Int, Rewriter.Rewriting]
    val fresh = freshGen()
    rews(0) = Rewriter.rewrite(nb, rews, 48, fresh)
    rews(1) = Rewriter.rewrite(nc, rews, 48, fresh)
    val Rewriter.Ok(cq) = Rewriter.rewrite(nd, rews, 48, fresh)
    assert(cq.body.map(_.pred).sorted == Vector("a", "b"))
    // both body atoms share the head variable
    assert(cq.body.forall(_.terms.head == cq.head.terms.head))
  }

  test("constant clash yields EmptyRewriting") {
    val (p, _) = TestKit.program("B(1) :- a(X)\nC(X) :- B(2)")
    val nb = TGNode(0, p.rules(0), Vector(None))
    val rews = scala.collection.mutable.Map.empty[Int, Rewriter.Rewriting]
    rews(0) = Rewriter.rewrite(nb, rews, 48, freshGen())
    val nc = TGNode(1, p.rules(1), Vector(Some(0)))
    assert(Rewriter.rewrite(nc, rews, 48, freshGen()) == Rewriter.EmptyRewriting)
  }

  test("oversized rewritings are reported as Oversized") {
    val (p, _) = TestKit.program("B(X) :- a(X), a(X), a(X)")
    val n = TGNode(0, p.rules(0), Vector(None, None, None))
    assert(Rewriter.rewrite(n, _ => sys.error("-"), 2, freshGen()) == Rewriter.Oversized)
  }

  // ---- Containment ----

  private def cq(head: String, body: String*): CQ = {
    val d = new TermDict
    CQ(DatalogParser.parseAtom(head, d),
       body.toVector.map(DatalogParser.parseAtom(_, d)))
  }

  test("identical queries are mutually contained") {
    val q = cq("Q(X,Y)", "e(X,Y)")
    assert(Containment.contained(q, q))
  }

  test("longer chain is contained in shorter projection query") {
    // Q1(X) <- e(X,Y), e(Y,Z)   ⊆   Q2(X) <- e(X,Y)
    val q1 = cq("Q(X)", "e(X,Y)", "e(Y,Z)")
    val q2 = cq("Q(X)", "e(X,Y)")
    assert(Containment.contained(q1, q2))
    assert(!Containment.contained(q2, q1))
  }

  test("repeated-variable query is contained in the general one") {
    val loop = cq("Q(X)", "e(X,X)")
    val gen = cq("Q(X)", "e(X,Y)")
    assert(Containment.contained(loop, gen))
    assert(!Containment.contained(gen, loop))
  }

  test("constants: specific is contained in general") {
    val spec = cq("Q(X)", "e(X, 5)")
    val gen = cq("Q(X)", "e(X, Y)")
    assert(Containment.contained(spec, gen))
    assert(!Containment.contained(gen, spec))
  }

  test("different head predicates are never contained") {
    assert(!Containment.contained(cq("Q(X)", "e(X,Y)"), cq("R(X)", "e(X,Y)")))
  }

  test("head variable correspondence is enforced") {
    // Q1(X,Y) <- e(X,Y)  vs  Q2(X,Y) <- e(Y,X): neither contains the other
    val q1 = cq("Q(X,Y)", "e(X,Y)")
    val q2 = cq("Q(X,Y)", "e(Y,X)")
    assert(!Containment.contained(q1, q2))
    assert(!Containment.contained(q2, q1))
  }

  test("chain of length 2 vs 3 (classic Chandra-Merlin)") {
    val c2 = cq("Q(X,Z)", "e(X,Y)", "e(Y,Z)")
    val c3 = cq("Q(X,W)", "e(X,Y)", "e(Y,Z)", "e(Z,W)")
    assert(!Containment.contained(c2, c3))
    assert(!Containment.contained(c3, c2))
  }
}

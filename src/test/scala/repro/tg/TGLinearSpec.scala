package repro.tg

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core._

/** tglinear (Alg. 1), H(P), and minLinear (Def. 14) — anchored on the
  * paper's Examples 1, 16 and 42.
  */
class TGLinearSpec extends AnyFunSuite {

  private val (p1, _) = TestKit.program(TestKit.p1Text)

  test("H(P): binary EDB predicate yields the two pattern facts of Example 16") {
    val pats = TGLinear.patternFacts(p1)
    assert(pats.size == 2)
    assert(pats.exists(f => f.args(0) != f.args(1))) // r(c1,c2)
    assert(pats.exists(f => f.args(0) == f.args(1))) // r(c3,c3)
  }

  test("H(P): pattern counts are Bell numbers of the arity") {
    assert(TGLinear.setPartitions(0).size == 1)
    assert(TGLinear.setPartitions(1).size == 1)
    assert(TGLinear.setPartitions(2).size == 2)
    assert(TGLinear.setPartitions(3).size == 5)
    assert(TGLinear.setPartitions(4).size == 15)
  }

  test("set partitions cover every position exactly once") {
    for (part <- TGLinear.setPartitions(3)) {
      assert(part.flatten.sorted == Vector(0, 1, 2))
    }
  }

  test("Example 1: tglinear builds G1 per pattern fact (r1, r4 roots; r2 below r1)") {
    val g = TGLinear.tglinear(p1)
    // two pattern facts × three derivations each (r1, r4, r2) = 6 nodes
    assert(g.numNodes == 6)
    val byRule = g.nodes.groupBy(_.rule.id).view.mapValues(_.size).toMap
    assert(byRule == Map(0 -> 2, 3 -> 2, 1 -> 2)) // r1, r4, r2; r3 never fires new
    // each r2-node hangs below an r1-node
    for (n <- g.nodes if n.rule.id == 1) {
      val parent = n.parents.head
      assert(parent.isDefined)
      assert(g.byId(parent.get).rule.id == 0)
    }
    assert(g.depth == 1)
  }

  test("Example 16: minLinear removes the r4 nodes (dominated by the r2 nodes)") {
    val g = TGLinear.minLinear(TGLinear.tglinear(p1))
    // G2 of Fig. 1(c): only r1 and r2 remain (per pattern subgraph, then
    // cross-pattern domination collapses duplicates further)
    assert(g.nodes.forall(_.rule.id != 3))
    assert(g.nodes.exists(_.rule.id == 0))
    assert(g.nodes.exists(_.rule.id == 1))
    assert(g.numNodes <= 4)
  }

  test("Example 42: preserving homomorphism exists from u2({f}) into u3({f})") {
    val g = TGLinear.tglinear(p1)
    val f = TGLinear.patternFacts(p1).head
    val insts = InMemChase.evalGraph(g, Hom.toInstance(Seq(f)))
    val r4node = g.nodes.find(n => n.rule.id == 3 && insts(n.id).nonEmpty).get
    val r2node = g.nodes.find(n => n.rule.id == 1 && insts(n.id).nonEmpty).get
    val hom = Hom.findHom(Hom.freeze(insts(r4node.id)),
      Hom.toInstance(insts(r2node.id)))
    assert(hom.isDefined)
  }

  test("reasoning over the minimized TG is equivalent to the chase (in memory)") {
    val g = TGLinear.minLinear(TGLinear.tglinear(p1))
    val d = new TermDict
    val base = TestKit.instance("r(1,2)\nr(5,5)\nr(6,7)", d)
    val nodeInsts = InMemChase.evalGraph(g, base)
    val tgResult = Hom.union(base, Hom.toInstance(nodeInsts.values.flatten))
    val ref = RefEvaluator.chase(p1, base, RefEvaluator.Restricted)
    TestKit.assertEquiv(tgResult, ref.instance)
  }

  test("tglinear on a Datalog chain program") {
    val (p, d) = TestKit.program("B(X) :- a(X)\nC(X) :- B(X)\nD(X) :- C(X)")
    val g = TGLinear.tglinear(p)
    assert(g.numNodes == 3)
    assert(g.depth == 2)
    val min = TGLinear.minLinear(g)
    assert(min.numNodes == 3) // nothing dominated in a chain
    val base = TestKit.instance("a(1)\na(2)", d)
    val insts = InMemChase.evalGraph(min, base)
    val out = Hom.union(base, Hom.toInstance(insts.values.flatten))
    TestKit.assertEquiv(out, RefEvaluator.chase(p, base).instance)
  }

  test("minLinear collapses equivalent sibling branches") {
    // two rules deriving the same predicate the same way
    val (p, d) = TestKit.program("B(X) :- a(X)\nB(X) :- a(X)\nC(X) :- B(X)")
    val min = TGLinear.minLinear(TGLinear.tglinear(p))
    // one of the two B-producers is dominated by the other
    assert(min.nodes.count(_.rule.head.pred == "B") == 1)
    val base = TestKit.instance("a(1)", d)
    val insts = InMemChase.evalGraph(min, base)
    val out = Hom.union(base, Hom.toInstance(insts.values.flatten))
    TestKit.assertEquiv(out, RefEvaluator.chase(p, base).instance)
  }

  test("tglinear requires a linear program") {
    val (p, _) = TestKit.program("C(X) :- a(X), b(X)")
    intercept[IllegalArgumentException](TGLinear.tglinear(p))
  }

  test("linearTracked: unique producer per derived fact") {
    val events = InMemChase.linearTracked(p1, Fact("r", Vector(1L, 2L)))
    val derived = events.map(_.derived)
    assert(derived.distinct.size == derived.size)
  }

  test("tglinear on an existential linear FES program keeps the null-introducing node") {
    // a(X) -> ∃Y P(X,Y); P(X,Y) -> Q(Y): the chase of each pattern is finite
    val (p, d) = TestKit.program("P(X,Y) :- a(X)\nQ(Y) :- P(X,Y)")
    val g = TGLinear.minLinear(TGLinear.tglinear(p))
    val base = TestKit.instance("a(1)\na(2)", d)
    val insts = InMemChase.evalGraph(g, base)
    val out = Hom.union(base, Hom.toInstance(insts.values.flatten))
    val ref = RefEvaluator.chase(p, base, RefEvaluator.Restricted)
    TestKit.assertEquiv(out, ref.instance)
  }
}

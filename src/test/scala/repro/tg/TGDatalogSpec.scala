package repro.tg

import repro.{SparkSpec, TestKit}
import repro.core.{Hom, RefEvaluator}
import repro.exec.FactStore

/** TGmat (Alg. 2): correctness against the reference chase (Thm. 24),
  * the Example 44 node enumeration, the optimization modes, and the
  * Example 22 flavour of ruleExec trigger savings.
  */
class TGDatalogSpec extends SparkSpec {

  private val modes = Seq(TGDatalog.NoOpt, TGDatalog.M, TGDatalog.MR)

  private def runAll(progText: String, factsText: String) = {
    val (p, d) = TestKit.program(progText)
    val facts = TestKit.facts(factsText, d)
    val st = FactStore.fromFacts(spark, p, facts)
    val ref = RefEvaluator.chase(p, Hom.toInstance(facts))
    val runs = modes.map(m => m -> TGDatalog.run(p, st, m)).toMap
    (p, ref, runs)
  }

  test("Thm 24: TGmat equals the chase on transitive closure (all modes)") {
    val (_, ref, runs) = runAll(
      "E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)",
      "e(1,2)\ne(2,3)\ne(3,4)\ne(4,5)\ne(7,7)")
    for ((m, r) <- runs) {
      TestKit.assertEquiv(r.result.store.toInstance, ref.instance)
      assert(r.result.idbFacts == ref.instance("E").size, s"mode ${m.name}")
    }
  }

  test("Thm 24: TGmat equals the chase on mutual recursion (all modes)") {
    val (_, ref, runs) = runAll(
      """
      Odd(Y) :- zero(X), s(X,Y)
      Even(Y) :- Odd(X), s(X,Y)
      Odd(Y) :- Even(X), s(X,Y)
      Even(X) :- zero(X)
      """,
      "zero(0)\ns(0,1)\ns(1,2)\ns(2,3)\ns(3,4)")
    for ((_, r) <- runs) TestKit.assertEquiv(r.result.store.toInstance, ref.instance)
  }

  test("Thm 24: TGmat equals the chase on a non-linear join program (all modes)") {
    val (_, ref, runs) = runAll(
      """
      A(X) :- a(X)
      R(X,Y) :- r(X,Y)
      A(X) :- R(X,Y), A(Y)
      A(X) :- R(X,Y), R(Y,Z)
      """,
      "a(4)\nr(1,2)\nr(2,3)\nr(3,4)\nr(9,1)")
    for ((_, r) <- runs) TestKit.assertEquiv(r.result.store.toInstance, ref.instance)
  }

  test("Example 44: level-2 candidates for P3 are (u1,u2) for r14 and (u2,u2)... ") {
    // P3 with a/r extensional; check the graph only contains nodes whose
    // parents produce the right predicates, and reasoning is correct.
    val (_, ref, runs) = runAll(
      """
      A(X) :- a(X)
      R(X,Y) :- r(X,Y)
      A(X) :- R(X,Y), A(Y)
      A(X) :- R(X,Y), R(Y,Z)
      """,
      "a(3)\nr(1,2)\nr(2,3)")
    val g = runs(TGDatalog.NoOpt).graph
    for (n <- g.nodes; (pOpt, i) <- n.parents.zipWithIndex; pid <- pOpt) {
      assert(g.byId(pid).rule.head.pred == n.rule.body(i).pred)
    }
    TestKit.assertEquiv(runs(TGDatalog.NoOpt).result.store.toInstance, ref.instance)
  }

  test("existential rules (restricted mode) match the restricted reference chase") {
    val (p, d) = TestKit.program(TestKit.p1Text)
    val facts = TestKit.facts("r(1,2)\nr(3,3)\nr(4,5)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val run = TGDatalog.run(p, st, TGDatalog.NoOpt)
    val ref = RefEvaluator.chase(p, Hom.toInstance(facts), RefEvaluator.Restricted)
    TestKit.assertEquiv(run.result.store.toInstance, ref.instance)
  }

  test("minDatalog never changes the result but can only shrink the graph") {
    val (_, _, runs) = runAll(
      "E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)",
      "e(1,2)\ne(2,3)\ne(3,4)\ne(4,5)\ne(5,6)\ne(6,7)\ne(7,8)")
    val no = runs(TGDatalog.NoOpt); val m = runs(TGDatalog.M)
    assert(m.result.idbFacts == no.result.idbFacts)
    assert(m.graph.numNodes <= no.graph.numNodes)
  }

  test("trigger counts: m+r <= m <= no-opt (Example 22's point)") {
    val (_, _, runs) = runAll(
      """
      A(X) :- a(X), b(X)
      A(X) :- ap(X), bp(X)
      B(X) :- A(X), c(X)
      """,
      (1 to 50).map(i => s"a($i)\nb($i)").mkString("\n") + "\n" +
      (1 to 50).map(i => s"ap($i)\nbp($i)").mkString("\n") + "\n" +
      "c(1)\nc(2)")
    val t = modes.map(m => runs(m).result.metrics.triggers)
    assert(t(2) <= t(1), s"m+r=${t(2)} vs m=${t(1)}")
    assert(t(1) <= t(0), s"m=${t(1)} vs no-opt=${t(0)}")
    // ruleExec must prune the second rule's bindings: everything it can
    // derive is already derived by the first rule
    assert(t(2) < t(0))
  }

  test("ruleExec pruning preserves the result") {
    val (_, ref, runs) = runAll(
      """
      A(X) :- a(X), b(X)
      A(X) :- ap(X), bp(X)
      B(X) :- A(X), c(X)
      """,
      "a(1)\nb(1)\nap(1)\nbp(1)\nap(2)\nbp(2)\nc(1)")
    TestKit.assertEquiv(runs(TGDatalog.MR).result.store.toInstance, ref.instance)
  }

  test("graph reports nodes, edges and depth") {
    val (_, _, runs) = runAll(
      "E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)",
      "e(1,2)\ne(2,3)\ne(3,4)")
    val g = runs(TGDatalog.MR).graph
    assert(g.numNodes >= 2)
    assert(g.depth >= 1)
    assert(g.numEdges >= 1)
  }

  test("constants in heads and bodies flow through TGmat") {
    val (_, ref, runs) = runAll(
      "Special(X, 9) :- t(X, 42)\nNext(Y) :- Special(X, Y)",
      "t(1,42)\nt(2,7)\nt(3,42)")
    for ((_, r) <- runs) TestKit.assertEquiv(r.result.store.toInstance, ref.instance)
    assert(runs(TGDatalog.MR).result.store.toInstance("Next") == Set(Vector(9L)))
  }

  test("empty base instance converges immediately") {
    val (p, _) = TestKit.program("E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)")
    val st = FactStore.empty(spark, p.arities)
    val run = TGDatalog.run(p, st, TGDatalog.MR)
    assert(run.result.idbFacts == 0)
    assert(run.graph.numNodes == 0)
  }

  test("pruneCoveringAtom finds a covering atom and preserves semantics") {
    val (p, d) = TestKit.program("A(X) :- ap(X), bp(X)")
    val facts = TestKit.facts("ap(1)\nap(2)\nbp(1)\nbp(2)\nA(1)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val r = p.rules.head
    val parts = r.body.zipWithIndex.map { case (a, i) =>
      repro.exec.RuleCompiler.atomBindings(a, st(a.pred), i.toString)
    }
    val Some((idx, pruned)) = TGDatalog.pruneCoveringAtom(r, parts, st("A"))
    assert(idx == 0)
    assert(pruned.collect().map(_.getLong(0)).toSet == Set(2L)) // 1 already in A
  }
}

package repro.chase

import repro.{Oracle, SparkSpec, TestKit}
import repro.core.{Hom, RefEvaluator}
import repro.exec.FactStore

/** Every chase variant must agree with the in-memory reference evaluator
  * (up to null renaming), and recursive Datalog results are additionally
  * checked against DuckDB WITH RECURSIVE.
  */
class ChaseEngineSpec extends SparkSpec {

  private def run(progText: String, factsText: String,
                  variant: ChaseEngine.Variant) = {
    val (p, d) = TestKit.program(progText)
    val facts = TestKit.facts(factsText, d)
    val st = FactStore.fromFacts(spark, p, facts)
    val out = ChaseEngine.run(p, st, variant)
    (p, Hom.toInstance(facts), out)
  }

  private val variants =
    Seq(ChaseEngine.VLogSim, ChaseEngine.RDFoxSim, ChaseEngine.COMSim)

  private val tcProg = "E(X,Y) :- e(X,Y)\nE(X,Z) :- E(X,Y), E(Y,Z)"
  private val tcData = "e(1,2)\ne(2,3)\ne(3,4)\ne(4,5)\ne(9,9)"

  for (v <- variants) {
    test(s"${v.name}: transitive closure matches the reference evaluator") {
      val (p, base, out) = run(tcProg, tcData, v)
      val ref = RefEvaluator.chase(p, base)
      TestKit.assertEquiv(out.store.toInstance, ref.instance)
    }

    test(s"${v.name}: transitive closure matches DuckDB WITH RECURSIVE") {
      val (p, _, out) = run(tcProg, tcData, v)
      val (_, d2) = TestKit.program(tcProg)
      val eDf = FactStore.fromFacts(spark, p, TestKit.facts(tcData, d2))("e")
      Oracle.assertEquivalent(out.store("E"),
        """WITH RECURSIVE tc(c0, c1) AS (
             SELECT c0, c1 FROM e
             UNION
             SELECT tc.c0, e.c1 FROM tc, e WHERE tc.c1 = e.c0
           ) SELECT c0, c1 FROM tc""",
        "e" -> eDf)
    }

    test(s"${v.name}: mutual recursion matches the reference evaluator") {
      val prog = """
        Odd(Y) :- zero(X), s(X,Y)
        Even(Y) :- Odd(X), s(X,Y)
        Odd(Y) :- Even(X), s(X,Y)
        Even(X) :- zero(X)
      """
      val data = "zero(0)\ns(0,1)\ns(1,2)\ns(2,3)\ns(3,4)\ns(4,5)"
      val (p, base, out) = run(prog, data, v)
      val ref = RefEvaluator.chase(p, base)
      TestKit.assertEquiv(out.store.toInstance, ref.instance)
      assert(out.store.toInstance("Even") == Set(Vector(0L), Vector(2L), Vector(4L)))
    }

    test(s"${v.name}: Example 1 program (existential) is equivalent to the reference") {
      val (p, base, out) = run(TestKit.p1Text, "r(1,2)\nr(3,3)", v)
      val policy = if (v == ChaseEngine.VLogSim) RefEvaluator.Restricted
                   else RefEvaluator.Skolem
      val ref = RefEvaluator.chase(p, base, policy)
      TestKit.assertEquiv(out.store.toInstance, ref.instance)
    }
  }

  test("restricted chase (VLog-sim) derives fewer facts than Skolem on satisfied heads") {
    val prog = "P(X,Y) :- p(X,Y)\nP(X,Z) :- q(X)"
    val data = "p(1,2)\nq(1)"
    val (_, _, restricted) = run(prog, data, ChaseEngine.VLogSim)
    val (_, _, skolem) = run(prog, data, ChaseEngine.RDFoxSim)
    assert(restricted.idbFacts == 1) // P(1,2) only
    assert(skolem.idbFacts == 2)     // + P(1, null)
  }

  test("all variants agree on a Datalog program with constants") {
    val prog = "Special(X) :- t(X,42)\nChained(Y) :- Special(X), link(X,Y)"
    val data = "t(1,42)\nt(2,7)\nlink(1,5)\nlink(2,6)"
    val results = variants.map(v => run(prog, data, v)._3.store.toInstance)
    results.sliding(2).foreach { case Seq(a, b) => assert(a == b) }
    assert(results.head("Chained") == Set(Vector(5L)))
  }

  test("semi-naive triggers are fewer than naive triggers on recursion") {
    val (_, _, sne) = run(tcProg, tcData, ChaseEngine.VLogSim)
    val (_, _, naive) = run(tcProg, tcData, ChaseEngine.COMSim)
    assert(sne.metrics.triggers < naive.metrics.triggers)
  }

  test("rounds are counted and the fixpoint stops") {
    val (_, _, out) = run(tcProg, "e(1,2)", ChaseEngine.VLogSim)
    assert(out.metrics.rounds >= 2) // derivation round + empty fixpoint round
    assert(out.idbFacts == 1)
  }

  test("empty base instance yields empty IDB") {
    val (p, _) = TestKit.program(tcProg)
    val st = FactStore.empty(spark, p.arities)
    val out = ChaseEngine.run(p, st, ChaseEngine.VLogSim)
    assert(out.idbFacts == 0)
  }

  test("rules over multiple EDB predicates fire in round one only") {
    val prog = "M(X,Z) :- a(X,Y), b(Y,Z)"
    val data = "a(1,2)\nb(2,3)\nb(2,4)"
    val (_, _, out) = run(prog, data, ChaseEngine.VLogSim)
    assert(out.store.toInstance("M") == Set(Vector(1L, 3L), Vector(1L, 4L)))
    assert(out.metrics.triggers == 2)
  }
}

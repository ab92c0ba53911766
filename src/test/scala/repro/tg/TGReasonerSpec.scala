package repro.tg

import repro.{SparkSpec, TestKit}
import repro.core.{Fact, Hom, RefEvaluator}
import repro.exec.FactStore

/** Def. 5 executed on Spark over instance-independent TGs, plus the
  * collective cleaning pass of Table 2.
  */
class TGReasonerSpec extends SparkSpec {

  test("Example 1/41: reasoning over the minimized TG equals the chase (on Spark)") {
    val (p, d) = TestKit.program(TestKit.p1Text)
    val facts = TestKit.facts("r(1,2)\nr(5,5)\nr(6,7)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val run = TGReasoner.materializeLinear(p, st, clean = true)
    val ref = RefEvaluator.chase(p, Hom.toInstance(facts), RefEvaluator.Restricted)
    TestKit.assertEquiv(run.result.store.toInstance, ref.instance)
  }

  test("w/o cleaning derives a superset (up to equivalence) of the chase") {
    val (p, d) = TestKit.program(TestKit.p1Text)
    val facts = TestKit.facts("r(1,2)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val dirty = TGReasoner.materializeLinear(p, st, clean = false)
    val ref = RefEvaluator.chase(p, Hom.toInstance(facts), RefEvaluator.Restricted)
    TestKit.assertEquiv(dirty.result.store.toInstance, ref.instance)
  }

  test("cleaning is collective: w/ cleaning has no more IDB facts than w/o") {
    val (p, d) = TestKit.program(LinearPrograms.chainWithDup)
    val facts = TestKit.facts("a(1)\na(2)\na(3)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val dirty = TGReasoner.materializeLinear(p, st, clean = false)
    val cleanR = TGReasoner.materializeLinear(p, st, clean = true)
    assert(cleanR.result.idbFacts <= dirty.result.idbFacts)
    TestKit.assertEquiv(cleanR.result.store.toInstance, dirty.result.store.toInstance)
  }

  test("cleanExtent drops exact duplicates") {
    val (p, d) = TestKit.program("B(X) :- a(X)")
    val st = FactStore.fromFacts(spark, p, TestKit.facts("a(1)", d))
    val dup = st("a").unionByName(st("a"))
    assert(TGReasoner.cleanExtent(dup).count() == 1)
  }

  test("cleanExtent drops null facts subsumed by null-free facts") {
    val (p, _) = TestKit.program("P(X,Y) :- a(X)")
    val st = FactStore.fromFacts(spark, p, Seq(
      Fact("P", Vector(1L, -5L)), Fact("P", Vector(1L, 9L)),
      Fact("P", Vector(2L, -6L))))
    val cleaned = TGReasoner.cleanExtent(st("P")).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(cleaned == Set((1L, 9L), (2L, -6L))) // (1,-5) subsumed, (2,-6) kept
  }

  test("cleanExtent honours repeated nulls") {
    // P(n,n) is subsumed by P(3,3) but NOT by P(3,4)
    val (p, _) = TestKit.program("P(X,Y) :- a(X)")
    val st1 = FactStore.fromFacts(spark, p, Seq(
      Fact("P", Vector(-7L, -7L)), Fact("P", Vector(3L, 4L))))
    assert(TGReasoner.cleanExtent(st1("P")).count() == 2)
    val st2 = FactStore.fromFacts(spark, p, Seq(
      Fact("P", Vector(-7L, -7L)), Fact("P", Vector(3L, 3L))))
    assert(TGReasoner.cleanExtent(st2("P")).count() == 1)
  }

  test("reason over an explicitly given graph") {
    val (p, d) = TestKit.program("B(X) :- a(X)\nC(X) :- B(X)")
    val g = ExecGraph(p, Vector(
      TGNode(0, p.rules(0), Vector(None)),
      TGNode(1, p.rules(1), Vector(Some(0)))))
    val st = FactStore.fromFacts(spark, p, TestKit.facts("a(1)\na(2)", d))
    val run = TGReasoner.reason(g, st, clean = true)
    assert(run.result.store.toInstance("C") == Set(Vector(1L), Vector(2L)))
    assert(run.result.metrics.triggers == 4)
  }

  test("linear Datalog scenario: Spark TG result equals semi-naive chase result") {
    val (p, d) = TestKit.program(
      "B(X) :- a(X)\nC(X) :- B(X)\nD(Y) :- e(X,Y)\nC(X) :- D(X)")
    val facts = TestKit.facts("a(1)\na(2)\ne(1,3)\ne(2,4)", d)
    val st = FactStore.fromFacts(spark, p, facts)
    val tg = TGReasoner.materializeLinear(p, st, clean = true)
    val chase = repro.chase.ChaseEngine.run(p, st, repro.chase.ChaseEngine.VLogSim)
    TestKit.assertEquiv(tg.result.store.toInstance, chase.store.toInstance)
  }
}

object LinearPrograms {
  /** Two linear paths deriving the same predicate — guaranteed duplicates
    * across TG nodes for the cleaning test.
    */
  val chainWithDup: String = """
    B(X) :- a(X)
    C(X) :- B(X)
    C(X) :- a(X)
  """
}

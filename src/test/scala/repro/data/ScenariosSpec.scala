package repro.data

import repro.{SparkSpec, TestKit}
import repro.chase.ChaseEngine
import repro.core.{Hom, RefEvaluator}
import repro.tg.{TGDatalog, TGReasoner}

/** Generators produce well-formed stores, and the engines agree on every
  * scenario at test scale — the repo-level integration tests.
  */
class ScenariosSpec extends SparkSpec {

  for (sc <- Scenarios.all) {
    test(s"${sc.name}: base instance is well-formed and non-trivial") {
      val st = sc.makeBase(spark, sc.testScale)
      assert(st.totalCount > 0, "empty base instance")
      for ((p, df) <- st.dfs) {
        assert(sc.program.arities.get(p).forall(_ == df.columns.length),
          s"arity mismatch for $p")
        assert(df.columns.toSeq == (0 until df.columns.length).map(i => s"c$i"))
      }
      // every EDB predicate the program mentions should have some data in
      // at least one scenario-variant; here just check declared arities fit
      assert(sc.program.rules.nonEmpty)
    }
  }

  // Engine-agreement matrix on the non-linear Datalog scenarios (linear
  // ones are covered by the tglinear loop below; DBpedia-L's ~130 rules
  // make chase rounds too job-heavy for unit tests — it runs in bench).
  private val agreementScenarios =
    Seq(Scenarios.lubmL, Scenarios.lubmLe, Scenarios.uobmL,
        Scenarios.clarosL, Scenarios.clarosLe, Scenarios.yago)

  for (sc <- agreementScenarios) {
    test(s"${sc.name}: VLog-sim and GLog m+r agree on the materialization") {
      val st = sc.makeBase(spark, sc.testScale).materialized
      val chase = ChaseEngine.run(sc.program, st, ChaseEngine.VLogSim)
      val glog = TGDatalog.run(sc.program, st, TGDatalog.MR)
      assert(chase.idbFacts == glog.result.idbFacts,
        s"chase=${chase.idbFacts} glog=${glog.result.idbFacts}")
    }
  }

  for (sc <- Scenarios.linearScenarios) {
    test(s"${sc.name}: linear TG reasoning agrees with the restricted chase") {
      val st = sc.makeBase(spark, sc.testScale).materialized
      val tg = TGReasoner.materializeLinear(sc.program, st, clean = true)
      val chase = ChaseEngine.run(sc.program, st, ChaseEngine.VLogSim)
      if (sc.program.isDatalog)
        assert(tg.result.idbFacts == chase.idbFacts,
          s"tg=${tg.result.idbFacts} chase=${chase.idbFacts}")
      else // with existentials compare up to null renaming
        TestKit.assertEquiv(tg.result.store.toInstance, chase.store.toInstance)
    }
  }

  test("ChaseBench scenarios: restricted TGmat agrees with VLog-sim") {
    for (sc <- Scenarios.chaseBenchScenarios) {
      val st = sc.makeBase(spark, sc.testScale).materialized
      val chase = ChaseEngine.run(sc.program, st, ChaseEngine.VLogSim)
      val glog = TGDatalog.run(sc.program, st, TGDatalog.NoOpt)
      TestKit.assertEquiv(glog.result.store.toInstance, chase.store.toInstance)
    }
  }

  test("LUBM-lite rulesets nest: LI ⊂ L ⊂ LE") {
    assert(LubmLite.li.rules.size < LubmLite.l.rules.size)
    assert(LubmLite.l.rules.size < LubmLite.le.rules.size)
    assert(LubmLite.li.isLinear)
    assert(!LubmLite.l.isLinear)
  }

  test("LUBM-lite scales linearly with universities") {
    val one = LubmLite.data(spark, 1).totalCount
    val three = LubmLite.data(spark, 3).totalCount
    assert(three >= 3 * one - 3 && three <= 3 * one + 3)
  }

  test("LUBM-lite LI closure on tiny data matches the reference evaluator") {
    val st = LubmLite.data(spark, 1)
    val inst = st.toInstance
    val ref = RefEvaluator.chase(LubmLite.li, inst)
    val tg = TGReasoner.materializeLinear(LubmLite.li, st, clean = true)
    assert(tg.result.idbFacts == ref.idbFacts(LubmLite.li))
  }

  test("Reactome-lite program is linear with existentials") {
    assert(OntoScenarios.reactomeLi.isLinear)
    assert(!OntoScenarios.reactomeLi.isDatalog)
  }

  test("ChaseBench programs have existential non-linear rules") {
    for (p <- Seq(ChaseBenchLite.stb, ChaseBenchLite.ont)) {
      assert(!p.isDatalog)
      assert(p.rules.exists(_.body.size > 1))
    }
    assert(ChaseBenchLite.ont.rules.size > ChaseBenchLite.stb.rules.size)
  }

  test("DBpedia-lite has many rules (wide taxonomy)") {
    assert(OntoScenarios.dbpediaLi.rules.size > 100)
    assert(OntoScenarios.dbpediaLi.isLinear)
  }

  test("Claros-lite LE adds symmetry on top of L") {
    assert(OntoScenarios.clarosLe.rules.size == OntoScenarios.clarosL.rules.size + 1)
  }

  test("scenario scales: bench > test for every scenario") {
    for (sc <- Scenarios.all) assert(sc.benchScale > sc.testScale)
  }
}

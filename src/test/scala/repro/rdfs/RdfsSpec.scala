package repro.rdfs

import repro.{SparkSpec, TestKit}
import repro.core.{Fact, Hom, RefEvaluator}
import repro.exec.FactStore
import repro.tg.TGDatalog

class RdfsSpec extends SparkSpec {

  private def triples(ts: (Long, Long, Long)*): Seq[Fact] =
    ts.map(t => Fact("t", Vector(t._1, t._2, t._3)))

  // small graph: c1 ⊑ c2 ⊑ c3; p1 ⊑ p0; dom(p0)=c1, rng(p0)=c2; x:c1, (x,p1,y)
  private val c1 = 100L; private val c2 = 101L; private val c3 = 102L
  private val p0 = 200L; private val p1 = 201L
  private val x = 300L; private val y = 301L
  private val base = triples(
    (c1, RhoDF.SubClassOf, c2), (c2, RhoDF.SubClassOf, c3),
    (p1, RhoDF.SubPropOf, p0),
    (p0, RhoDF.Domain, c1), (p0, RhoDF.Range, c2),
    (x, RhoDF.Type, c1), (x, p1, y))

  private def store = FactStore.fromFacts(spark, RhoDF.program, base)
  private lazy val ref = RefEvaluator.chase(RhoDF.program, Hom.toInstance(base))

  test("ρDF program is Datalog over a single ternary EDB") {
    assert(RhoDF.program.isDatalog)
    assert(RhoDF.program.edbPreds == Set("t"))
  }

  test("reference semantics: subclass transitivity and type inheritance") {
    assert(ref.instance("SC").contains(Vector(c1, c3)))
    assert(ref.instance("TYPE").contains(Vector(x, c3)))
  }

  test("reference semantics: subproperty inheritance fires domain/range") {
    // (x,p1,y) + p1⊑p0 => (x,p0,y) => dom: x:c1 (already), rng: y:c2, y:c3
    assert(ref.instance("T").contains(Vector(x, p0, y)))
    assert(ref.instance("TYPE").contains(Vector(y, c2)))
    assert(ref.instance("TYPE").contains(Vector(y, c3)))
  }

  test("WebPIE-sim computes the ρDF closure") {
    val out = WebPIESim.run(RhoDF.program, store)
    TestKit.assertEquiv(out.store.toInstance, ref.instance)
  }

  test("GLog (TGmat m+r) computes the ρDF closure") {
    val out = TGDatalog.run(RhoDF.program, store, TGDatalog.MR)
    TestKit.assertEquiv(out.result.store.toInstance, ref.instance)
  }

  test("Inferray-sim (naive chase) computes the ρDF closure") {
    val out = repro.chase.ChaseEngine.run(RhoDF.program, store,
      repro.chase.ChaseEngine.COMSim)
    TestKit.assertEquiv(out.store.toInstance, ref.instance)
  }

  test("WebPIE-sim pays more triggers than GLog") {
    val webpie = WebPIESim.run(RhoDF.program, store)
    val glog = TGDatalog.run(RhoDF.program, store, TGDatalog.MR)
    assert(webpie.metrics.triggers > glog.result.metrics.triggers)
  }

  test("generated LUBM-rdf data has schema and instance triples") {
    val st = repro.data.RdfsData.lubmRdf(spark, 200)
    assert(st.count("t") > 200)
    val out = TGDatalog.run(RhoDF.program, st, TGDatalog.MR)
    assert(out.result.idbFacts > st.count("t")) // closure adds facts
  }

  test("generated YAGO data closure grows with deep taxonomy") {
    val st = repro.data.RdfsData.yago(spark, 120)
    val out = TGDatalog.run(RhoDF.program, st, TGDatalog.MR)
    // every entity gains ~depth type facts
    assert(out.result.store.count("TYPE") > 120 * 5)
  }
}

package repro.props

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import repro.{SparkSpec, TestKit}
import repro.chase.ChaseEngine
import repro.core._
import repro.exec.FactStore
import repro.tg.TGDatalog

/** Randomized cross-validation: on arbitrary small Datalog programs and
  * base instances, every Spark engine and every TGmat mode must equal the
  * in-memory reference chase. Deterministic seeds keep the suite
  * reproducible (only scalatest + scalacheck are available offline, so
  * sampling is driven directly rather than via scalatestplus).
  */
class PropertySpec extends SparkSpec {

  private val Samples = 5

  private def sample[T](g: Gen[T], seed: Long): T =
    g.pureApply(Gen.Parameters.default, Seed(seed))

  private val edbPreds = Vector("e" -> 2, "a" -> 1)
  private val idbPreds = Vector("E" -> 2, "A" -> 1, "B" -> 1)
  private val vars = Vector("X", "Y", "Z")

  private def genAtom(preds: Vector[(String, Int)]): Gen[Atom] =
    for {
      (p, n) <- Gen.oneOf(preds)
      ts <- Gen.listOfN(n, Gen.oneOf(vars.map(v => Var(v): Term)))
    } yield Atom(p, ts.toVector)

  /** A random safe Datalog rule: head vars ⊆ body vars. */
  private val genRule: Gen[(Vector[Atom], Atom)] =
    for {
      nBody <- Gen.choose(1, 2)
      body <- Gen.listOfN(nBody, genAtom(edbPreds ++ idbPreds))
      bodyVars = body.flatMap(_.vars).distinct
      (hp, hn) <- Gen.oneOf(idbPreds)
      headTs <- Gen.listOfN(hn, Gen.oneOf(bodyVars))
    } yield (body.toVector, Atom(hp, headTs.toVector))

  private val genProgram: Gen[Program] =
    Gen.choose(2, 4).flatMap(n => Gen.listOfN(n, genRule)).map(Program(_))

  private val genBase: Gen[Vector[Fact]] =
    for {
      nE <- Gen.choose(1, 8)
      nA <- Gen.choose(1, 4)
      es <- Gen.listOfN(nE, Gen.zip(Gen.choose(1L, 5L), Gen.choose(1L, 5L)))
      as <- Gen.listOfN(nA, Gen.choose(1L, 5L))
    } yield (es.map { case (x, y) => Fact("e", Vector(x, y)) } ++
             as.map(x => Fact("a", Vector(x)))).toVector

  private def cases: Seq[(Program, Vector[Fact])] =
    (0 until Samples).map(i =>
      (sample(genProgram, 1000 + i), sample(genBase, 2000 + i)))

  private def check(p: Program, base: Vector[Fact],
                    run: (Program, FactStore) => Hom.Instance): Unit = {
    val st = FactStore.fromFacts(spark, p, base)
    val ref = RefEvaluator.chase(p, Hom.toInstance(base))
    val got = run(p, st)
    TestKit.assertEquiv(got, ref.instance)
  }

  for (((p, base), i) <- cases.zipWithIndex) {
    test(s"random #$i: VLog-sim equals the reference chase") {
      check(p, base, (p, st) => ChaseEngine.run(p, st, ChaseEngine.VLogSim).store.toInstance)
    }
    test(s"random #$i: RDFox-sim equals the reference chase") {
      check(p, base, (p, st) => ChaseEngine.run(p, st, ChaseEngine.RDFoxSim).store.toInstance)
    }
    test(s"random #$i: COM-sim equals the reference chase") {
      check(p, base, (p, st) => ChaseEngine.run(p, st, ChaseEngine.COMSim).store.toInstance)
    }
    test(s"random #$i: TGmat no-opt equals the reference chase") {
      check(p, base, (p, st) => TGDatalog.run(p, st, TGDatalog.NoOpt).result.store.toInstance)
    }
    test(s"random #$i: TGmat m equals the reference chase") {
      check(p, base, (p, st) => TGDatalog.run(p, st, TGDatalog.M).result.store.toInstance)
    }
    test(s"random #$i: TGmat m+r equals the reference chase") {
      check(p, base, (p, st) => TGDatalog.run(p, st, TGDatalog.MR).result.store.toInstance)
    }
    test(s"random #$i: optimizations never increase triggers") {
      val st = FactStore.fromFacts(spark, p, base)
      val no = TGDatalog.run(p, st, TGDatalog.NoOpt).result.metrics.triggers
      val mr = TGDatalog.run(p, st, TGDatalog.MR).result.metrics.triggers
      assert(mr <= no)
    }
  }

  // linear Datalog programs through the instance-independent pipeline
  private val genLinRule: Gen[(Vector[Atom], Atom)] =
    for {
      bodyAtom <- genAtom(edbPreds ++ idbPreds)
      bodyVars = bodyAtom.vars.distinct
      (hp, hn) <- Gen.oneOf(idbPreds)
      headTs <- Gen.listOfN(hn, Gen.oneOf(bodyVars))
    } yield (Vector(bodyAtom), Atom(hp, headTs.toVector))
  private val genLin: Gen[Program] =
    Gen.choose(2, 4).flatMap(n => Gen.listOfN(n, genLinRule)).map(Program(_))

  for (i <- 0 until Samples) {
    test(s"random linear #$i: minimized tglinear TG equals the chase (in memory)") {
      val p = sample(genLin, 3000 + i)
      val base = sample(genBase, 4000 + i)
      val g = repro.tg.TGLinear.minLinear(repro.tg.TGLinear.tglinear(p))
      val insts = repro.tg.InMemChase.evalGraph(g, Hom.toInstance(base))
      val out = Hom.union(Hom.toInstance(base), Hom.toInstance(insts.values.flatten))
      TestKit.assertEquiv(out, RefEvaluator.chase(p, Hom.toInstance(base)).instance)
    }
  }
}

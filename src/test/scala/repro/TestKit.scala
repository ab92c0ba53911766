package repro

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.exec.FactStore

/** Shared helpers for the test suites: text-defined programs/instances and
  * equivalence assertions up to null renaming.
  */
object TestKit {

  def program(text: String): (Program, TermDict) = {
    val dict = new TermDict
    (DatalogParser.parse(text, dict), dict)
  }

  def facts(text: String, dict: TermDict): Vector[Fact] =
    DatalogParser.parseFacts(text, dict)

  def store(spark: SparkSession, p: Program, fs: Seq[Fact]): FactStore =
    FactStore.fromFacts(spark, p, fs)

  def instance(text: String, dict: TermDict): Hom.Instance =
    Hom.toInstance(facts(text, dict))

  /** Facts of `src` (grouped with their null-sharing companions) that
    * have no homomorphism into `dst` — the actual witnesses of a failed
    * entailment, for error messages.
    */
  def unmappable(src: Hom.Instance, dst: Hom.Instance): Seq[Seq[Fact]] = {
    val (ground, withNulls) = Hom.factsOf(src).toSeq.partition(!_.hasNulls)
    val g = ground.filterNot(Hom.contains(dst, _)).map(Seq(_))
    val n = withNulls.groupBy(_.args.find(_ < 0).get) // approx grouping
      .valuesIterator
      .filter(grp => Hom.findHom(Hom.freeze(grp), dst).isEmpty)
      .map(_.toSeq).toSeq
    g ++ n
  }

  /** Asserts two instances are logically equivalent (hom both ways). */
  def assertEquiv(a: Hom.Instance, b: Hom.Instance): Unit = {
    assert(Hom.entails(b, a),
      s"a-facts unmappable into b (|a|=${Hom.size(a)} |b|=${Hom.size(b)}): " +
      unmappable(a, b).take(3))
    assert(Hom.entails(a, b),
      s"b-facts unmappable into a (|a|=${Hom.size(a)} |b|=${Hom.size(b)}): " +
      unmappable(b, a).take(3))
  }

  /** Restricts an instance to the IDB predicates of a program. */
  def idbOnly(i: Hom.Instance, p: Program): Hom.Instance =
    i.filter { case (pred, _) => p.idbPreds(pred) }

  /** The paper's running example program P1 (Example 1). */
  val p1Text: String = """
    R(X,Y) :- r(X,Y)
    T(Y,X,Y) :- R(X,Y)
    R(X,Y) :- T(Y,X,Y)
    T(Y,X,Z) :- r(X,Y)
  """
}

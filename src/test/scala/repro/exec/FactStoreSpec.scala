package repro.exec

import repro.{SparkSpec, TestKit}
import repro.core.Fact

class FactStoreSpec extends SparkSpec {

  private val (p, d) = TestKit.program("E(X,Z) :- e(X,Y), e(Y,Z)")

  test("fromFacts/toInstance roundtrip") {
    val fs = TestKit.facts("e(1,2)\ne(2,3)", d)
    val st = FactStore.fromFacts(spark, p, fs)
    assert(st.toInstance == Map("e" -> Set(Vector(1L, 2L), Vector(2L, 3L))))
  }

  test("fromFacts dedups") {
    val st = FactStore.fromFacts(spark, p, Seq(
      Fact("e", Vector(1L, 2L)), Fact("e", Vector(1L, 2L))))
    assert(st.count("e") == 1)
  }

  test("missing predicates resolve to empty extents with the right schema") {
    val st = FactStore.fromFacts(spark, p, TestKit.facts("e(1,2)", d))
    val df = st("E")
    assert(df.columns.toSeq == Seq("c0", "c1"))
    assert(df.count() == 0)
  }

  test("add unions without dedup") {
    val st = FactStore.fromFacts(spark, p, TestKit.facts("e(1,2)", d))
    val st2 = st.add("e", st("e"))
    assert(st2.count("e") == 2)
  }

  test("totalCount sums extents") {
    val st = FactStore.fromFacts(spark, p, TestKit.facts("e(1,2)\ne(2,3)", d))
    assert(st.totalCount == 2)
  }

  test("materialized preserves content") {
    val st = FactStore.fromFacts(spark, p, TestKit.facts("e(1,2)\ne(2,3)", d))
    assert(st.materialized.toInstance == st.toInstance)
  }

  test("schemaOf produces non-nullable Long columns c0..") {
    val s = FactStore.schemaOf(3)
    assert(s.fieldNames.toSeq == Seq("c0", "c1", "c2"))
    assert(s.fields.forall(f => !f.nullable))
  }

  test("updated replaces a single extent") {
    val st = FactStore.fromFacts(spark, p, TestKit.facts("e(1,2)", d))
    val st2 = st.updated("e", FactStore.emptyDf(spark, 2))
    assert(st2.count("e") == 0 && st.count("e") == 1)
  }
}

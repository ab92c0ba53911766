package repro.bench

import repro.SparkSpec

/** Benchmark suites, one per evaluation table (run via `sbt "bench/test"`).
  *
  * Scales are the registry's bench defaults, shrinkable through
  * -Drepro.bench.factor (e.g. 0.25 for a smoke run). Results print to
  * stdout and append to bench/results/.
  */
trait BenchBase extends SparkSpec {
  lazy val factor: Double =
    sys.props.get("repro.bench.factor").map(_.toDouble).getOrElse(1.0)
}

class Table1StatsBench extends BenchBase {
  test("Table 1: benchmark statistics") {
    assert(Tables.table1(spark, factor).nonEmpty)
  }
}

class Table2LinearBench extends BenchBase {
  test("Table 2 (+8a): linear scenarios") {
    assert(Tables.table2(spark, factor).nonEmpty)
  }
}

class Table3DatalogBench extends BenchBase {
  test("Table 3 (+5, +8b): Datalog scenarios") {
    assert(Tables.table3(spark, factor).nonEmpty)
  }
}

class Table4ChaseBenchBench extends BenchBase {
  test("Table 4: ChaseBench scenarios") {
    assert(Tables.table4(spark, factor).nonEmpty)
  }
}

class Table6RdfsBench extends BenchBase {
  test("Table 6: RDFS (ρDF) scenarios") {
    assert(Tables.table6(spark, factor).nonEmpty)
  }
}

class Table7ScalabilityBench extends BenchBase {
  test("Table 7: scalability sweep") {
    val sweep = Seq(50, 100, 200, 400, 800, 1600)
      .map(u => math.max(1, (u * factor).toInt))
    assert(Tables.table7(spark, sweep).nonEmpty)
  }
}

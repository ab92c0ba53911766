package repro.data

import org.apache.spark.sql.SparkSession
import repro.core.Program
import repro.exec.FactStore
import repro.rdfs.RhoDF

/** Registry mapping the paper's evaluation scenarios (§7.1, Table 1) to
  * their synthetic substitutes. `benchScale` is the size knob used by the
  * bench suites; `testScale` by unit tests.
  */
final case class Scenario(name: String, program: Program,
                          makeBase: (SparkSession, Int) => FactStore,
                          benchScale: Int, testScale: Int,
                          linear: Boolean)

object Scenarios {

  // ---- linear scenarios (Table 2) ----
  val lubmLi = Scenario("LUBM-LI", LubmLite.li, LubmLite.data, 16, 2, linear = true)
  val uobmLi = Scenario("UOBM-LI", OntoScenarios.uobmLi, OntoScenarios.uobmData,
    10, 2, linear = true)
  val dbpediaLi = Scenario("DBpedia-LI", OntoScenarios.dbpediaLi,
    OntoScenarios.dbpediaData, 25000, 2000, linear = true)
  val clarosLi = Scenario("Claros-LI", OntoScenarios.clarosLi,
    OntoScenarios.clarosData, 30000, 2000, linear = true)
  val reactomeLi = Scenario("Reactome-LI", OntoScenarios.reactomeLi,
    OntoScenarios.reactomeData, 30000, 2000, linear = true)

  val linearScenarios: Seq[Scenario] =
    Seq(lubmLi, uobmLi, dbpediaLi, clarosLi, reactomeLi)

  // ---- Datalog scenarios (Tables 3, 5) ----
  val lubmL = Scenario("LUBM-L", LubmLite.l, LubmLite.data, 16, 2, linear = false)
  val lubmLe = Scenario("LUBM-LE", LubmLite.le, LubmLite.data, 10, 2, linear = false)
  val uobmL = Scenario("UOBM-L", OntoScenarios.uobmL, OntoScenarios.uobmData,
    8, 2, linear = false)
  val dbpediaL = Scenario("DBpedia-L", OntoScenarios.dbpediaL,
    OntoScenarios.dbpediaData, 25000, 2000, linear = false)
  val clarosL = Scenario("Claros-L", OntoScenarios.clarosL,
    OntoScenarios.clarosData, 25000, 2000, linear = false)
  val clarosLe = Scenario("Claros-LE", OntoScenarios.clarosLe,
    OntoScenarios.clarosData, 12000, 1200, linear = false)

  val datalogScenarios: Seq[Scenario] =
    Seq(lubmL, lubmLe, uobmL, dbpediaL, clarosL, clarosLe)

  // ---- ChaseBench scenarios (Table 4) ----
  val stb = Scenario("STB-128", ChaseBenchLite.stb,
    (s, n) => ChaseBenchLite.data(s, copies = 5, scale = n), 4000, 300, linear = false)
  val ont = Scenario("ONT-256", ChaseBenchLite.ont,
    (s, n) => ChaseBenchLite.data(s, copies = 7, scale = n), 4000, 300, linear = false)

  val chaseBenchScenarios: Seq[Scenario] = Seq(stb, ont)

  // ---- ρDF scenarios (Table 6) ----
  val lubmRdf = Scenario("LUBM-rdfs", RhoDF.program, RdfsData.lubmRdf,
    30000, 2000, linear = false)
  val yago = Scenario("YAGO-rdfs", RhoDF.program, RdfsData.yago,
    20000, 2000, linear = false)

  val rdfsScenarios: Seq[Scenario] = Seq(lubmRdf, yago)

  val all: Seq[Scenario] =
    linearScenarios ++ datalogScenarios ++ chaseBenchScenarios ++ rdfsScenarios
}

package repro.bench

import org.apache.spark.sql.SparkSession
import repro.chase.ChaseEngine
import repro.data.{Scenario, Scenarios}
import repro.tg.TGDatalog

/** One driver per evaluation table (§7). Each renders the same rows the
  * paper reports, prints them, and appends them to bench/results/ for
  * EXPERIMENTS.md. Functions are shared by the spark-submit jobs in
  * jobs/ and by the bench test suites.
  */
object Tables {

  import Harness._

  private def scaleOf(s: Scenario, factor: Double) =
    math.max(1, (s.benchScale * factor).toInt)

  /** Table 1: scenario statistics (#rules, #EDB facts, #IDB facts). */
  def table1(spark: SparkSession, factor: Double = 1.0): String = {
    val rows = Scenarios.all.map { sc =>
      val (base, edb) = prepareBase(sc, spark, scaleOf(sc, factor))
      val idb = logged(s"table1/${sc.name}") {
        if (sc.linear) runTgLinear(sc.program, base, clean = true).base.idb
        else if (sc.program.isDatalog) runTgmat(sc.program, base, TGDatalog.MR).base.idb
        else runTgmat(sc.program, base, TGDatalog.NoOpt).base.idb
      }
      Seq(sc.name, sc.program.rules.size.toString, edb.toString, idb.toString,
        f"${100.0 * idb / edb}%.0f%%")
    }
    val t = fmtTable("Table 1: benchmark statistics",
      Seq("scenario", "#rules", "#EDB", "#IDB", "IDB/EDB"), rows)
    save("table1", t); t
  }

  /** Table 2: linear scenarios (+ appendix Table 8a trigger counts). */
  def table2(spark: SparkSession, factor: Double = 1.0): String = {
    val header = Seq("scenario", "engine", "run(s)", "mem(MB)", "triggers",
      "idb", "comp(s)", "reason(s)", "#N", "#E", "D")
    val rows = Scenarios.linearScenarios.flatMap { sc =>
      val (base, _) = prepareBase(sc, spark, scaleOf(sc, factor))
      val chase = Seq(ChaseEngine.VLogSim, ChaseEngine.RDFoxSim, ChaseEngine.COMSim)
        .map(v => logged(s"${sc.name}/${v.name}")(runChase(sc.program, base, v)))
      val woClean = logged(s"${sc.name}/glog-dirty")(runTgLinear(sc.program, base, clean = false))
      val wClean = logged(s"${sc.name}/glog-clean")(runTgLinear(sc.program, base, clean = true))
      val chaseRows = chase.map(r => Seq(sc.name, r.engine, fmt(r.runtimeS),
        r.memMb.toString, r.triggers.toString, r.idb.toString, "-", "-", "-", "-", "-"))
      val tgRows = Seq(woClean, wClean).map(t => Seq(sc.name, t.base.engine,
        fmt(t.base.runtimeS), t.base.memMb.toString, t.base.triggers.toString,
        t.base.idb.toString, fmt(t.compS), fmt(t.reasonS),
        t.nodes.toString, t.edges.toString, t.depth.toString))
      chaseRows ++ tgRows
    }
    val t = fmtTable("Table 2: linear scenarios (+Table 8a triggers)", header, rows)
    save("table2", t); t
  }

  /** Tables 3 + 5 + 8b: Datalog scenarios, trigger counts, opt costs. */
  def table3(spark: SparkSession, factor: Double = 1.0,
             scenarios: Seq[Scenario] = Scenarios.datalogScenarios): String = {
    val header = Seq("scenario", "engine", "run(s)", "mem(MB)", "triggers",
      "idb", "#N", "#E", "D", "m(s)", "r(s)")
    val rows = scenarios.flatMap { sc =>
      val (base, _) = prepareBase(sc, spark, scaleOf(sc, factor))
      val chase = Seq(ChaseEngine.VLogSim, ChaseEngine.RDFoxSim, ChaseEngine.COMSim)
        .map(v => logged(s"${sc.name}/${v.name}")(runChase(sc.program, base, v)))
      val tg = Seq(TGDatalog.NoOpt, TGDatalog.M, TGDatalog.MR)
        .map(m => logged(s"${sc.name}/glog-${m.name}")(runTgmat(sc.program, base, m)))
      val chaseRows = chase.map(r => Seq(sc.name, r.engine, fmt(r.runtimeS),
        r.memMb.toString, r.triggers.toString, r.idb.toString, "-", "-", "-", "-", "-"))
      val tgRows = tg.map(t => Seq(sc.name, t.base.engine, fmt(t.base.runtimeS),
        t.base.memMb.toString, t.base.triggers.toString, t.base.idb.toString,
        t.nodes.toString, t.edges.toString, t.depth.toString,
        fmt(t.minDatalogS), fmt(t.ruleExecS)))
      chaseRows ++ tgRows
    }
    val t = fmtTable("Table 3: Datalog scenarios (+Table 5 triggers, Table 8b opt costs)",
      header, rows)
    save("table3", t); t
  }

  /** Table 4: ChaseBench scenarios (existential, non-linear). */
  def table4(spark: SparkSession, factor: Double = 1.0): String = {
    val header = Seq("scenario", "engine", "run(s)", "mem(MB)", "triggers",
      "idb", "#N", "#E", "D")
    val rows = Scenarios.chaseBenchScenarios.flatMap { sc =>
      val (base, _) = prepareBase(sc, spark, scaleOf(sc, factor))
      val chase = Seq(ChaseEngine.VLogSim, ChaseEngine.RDFoxSim, ChaseEngine.COMSim)
        .map(v => logged(s"${sc.name}/${v.name}")(runChase(sc.program, base, v)))
      val tg = logged(s"${sc.name}/glog")(runTgmat(sc.program, base, TGDatalog.NoOpt))
      chase.map(r => Seq(sc.name, r.engine, fmt(r.runtimeS), r.memMb.toString,
        r.triggers.toString, r.idb.toString, "-", "-", "-")) :+
      Seq(sc.name, "GLog", fmt(tg.base.runtimeS), tg.base.memMb.toString,
        tg.base.triggers.toString, tg.base.idb.toString,
        tg.nodes.toString, tg.edges.toString, tg.depth.toString)
    }
    val t = fmtTable("Table 4: ChaseBench scenarios", header, rows)
    save("table4", t); t
  }

  /** Table 6: ρDF scenarios — WebPIE / Inferray / VLog / GLog. */
  def table6(spark: SparkSession, factor: Double = 1.0): String = {
    val header = Seq("scenario", "engine", "run(s)", "mem(MB)", "triggers", "idb")
    val rows = Scenarios.rdfsScenarios.flatMap { sc =>
      val (base, _) = prepareBase(sc, spark, scaleOf(sc, factor))
      val webpie = logged(s"${sc.name}/webpie")(runWebPie(sc.program, base))
      // Inferray: rule-at-a-time full evaluation ≈ naive chase schedule
      val inferray = logged(s"${sc.name}/inferray")(
        runChase(sc.program, base, ChaseEngine.COMSim)).copy(engine = "Inferray-sim")
      val vlog = logged(s"${sc.name}/vlog")(runChase(sc.program, base, ChaseEngine.VLogSim))
      val glog = logged(s"${sc.name}/glog")(runTgmat(sc.program, base, TGDatalog.MR)).base
      Seq(webpie, inferray, vlog, glog).map(r => Seq(sc.name, r.engine,
        fmt(r.runtimeS), r.memMb.toString, r.triggers.toString, r.idb.toString))
    }
    val t = fmtTable("Table 6: RDFS (ρDF) scenarios", header, rows)
    save("table6", t); t
  }

  /** Table 7: scalability — LUBM-L with doubling base instances. */
  def table7(spark: SparkSession, univSweep: Seq[Int] = Seq(50, 100, 200, 400, 800, 1600)): String = {
    val header = Seq("#univ", "EDB", "run(s)", "mem(MB)", "IDB")
    val rows = univSweep.map { u =>
      val (base, edb) = prepareBase(Scenarios.lubmL, spark, u)
      val r = logged(s"table7/univ=$u")(
        runTgmat(Scenarios.lubmL.program, base, TGDatalog.MR)).base
      Seq(u.toString, edb.toString, fmt(r.runtimeS), r.memMb.toString, r.idb.toString)
    }
    val t = fmtTable("Table 7: scalability (LUBM-L, GLog m+r)", header, rows)
    save("table7", t); t
  }
}

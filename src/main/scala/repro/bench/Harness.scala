package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import org.apache.spark.sql.SparkSession
import repro.chase.ChaseEngine
import repro.core.Program
import repro.data.Scenario
import repro.exec.{FactStore, RunResult}
import repro.rdfs.WebPIESim
import repro.tg.{TGDatalog, TGReasoner}

/** Shared benchmark harness: runs one engine on one scenario, collects
  * the paper's measures, renders aligned text tables, and appends them to
  * `bench/results/` so EXPERIMENTS.md can diff paper vs measured.
  */
object Harness {

  final case class EngineRow(engine: String, runtimeS: Double, memMb: Long,
                             triggers: Long, idb: Long, rounds: Int,
                             extra: Map[String, String] = Map.empty)

  /** Materializes a scenario's base instance outside the timed region. */
  def prepareBase(scenario: Scenario, spark: SparkSession, scale: Int): (FactStore, Long) = {
    val base = scenario.makeBase(spark, scale).materialized
    (base, base.totalCount)
  }

  def row(name: String, r: RunResult): EngineRow =
    EngineRow(name, r.metrics.wallMs / 1000.0, r.metrics.peakMemMb,
      r.metrics.triggers, r.idbFacts, r.metrics.rounds)

  def runChase(program: Program, base: FactStore,
               variant: ChaseEngine.Variant): EngineRow =
    row(variant.name, ChaseEngine.run(program, base, variant))

  def runWebPie(program: Program, base: FactStore): EngineRow =
    row("WebPIE-sim", WebPIESim.run(program, base))

  final case class TgLinearRow(base: EngineRow, compS: Double, reasonS: Double,
                               cleanS: Double, nodes: Int, edges: Int, depth: Int)

  def runTgLinear(program: Program, baseStore: FactStore, clean: Boolean): TgLinearRow = {
    val run = TGReasoner.materializeLinear(program, baseStore, clean)
    val g = run.graph
    val er = row(if (clean) "GLog w/ cleaning" else "GLog w/o cleaning", run.result)
      .copy(runtimeS = (run.compMs + run.reasonMs + run.cleanMs) / 1000.0)
    TgLinearRow(er, run.compMs / 1000.0, run.reasonMs / 1000.0, run.cleanMs / 1000.0,
      g.numNodes, g.numEdges, g.depth)
  }

  final case class TgmatRow(base: EngineRow, nodes: Int, edges: Int, depth: Int,
                            minDatalogS: Double, ruleExecS: Double)

  def runTgmat(program: Program, baseStore: FactStore,
               mode: TGDatalog.Mode): TgmatRow = {
    val run = TGDatalog.run(program, baseStore, mode)
    TgmatRow(row(s"GLog ${mode.name}", run.result),
      run.graph.numNodes, run.graph.numEdges, run.graph.depth,
      run.result.metrics.minDatalogMs / 1000.0,
      run.result.metrics.ruleExecMs / 1000.0)
  }

  // ------------------------------------------------------------ output --

  /** Times one engine run, logging start/stop to stderr for monitoring. */
  def logged[T](label: String)(f: => T): T = {
    val t0 = System.nanoTime()
    Console.err.println(s"[bench] start $label")
    val r = f
    Console.err.println(f"[bench] done  $label in ${(System.nanoTime() - t0) / 1e9}%.1fs")
    r
  }

  def fmtTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (s"== $title ==" +: line(header) +: rows.map(line)).mkString("\n") + "\n"
  }

  def fmt(d: Double): String = if (d >= 100) f"$d%.0f" else f"$d%.2f"
  def fmtM(n: Long): String = f"${n / 1e6}%.2fM"

  /** Prints and appends a table to bench/results/<file>.txt. */
  def save(file: String, content: String): Unit = {
    println(content)
    val dir = Paths.get(sys.props.getOrElse("repro.results.dir", "bench/results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$file.txt"), (content + "\n").getBytes,
      StandardOpenOption.CREATE, StandardOpenOption.APPEND)
  }
}

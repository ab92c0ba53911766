package repro.rdfs

import org.apache.spark.sql.DataFrame
import repro.core.Program
import repro.exec.{FactStore, Metrics, RuleCompiler, RunResult}

/** WebPIE-style materialization (§7.4): stateless MapReduce rounds.
  *
  * Every round re-executes every rule over the full current instance and
  * performs one global distinct at the end — there are no deltas and no
  * incremental dedup, which is exactly why WebPIE pays orders of
  * magnitude more trigger work than GLog on the same ρDF programs.
  */
object WebPIESim {

  def run(program: Program, base: FactStore, maxRounds: Int = 100): RunResult = {
    val m = new Metrics
    val t0 = System.nanoTime()
    var store = base.copy(arities = base.arities ++ program.arities)
    var changed = true
    while (changed) {
      m.rounds += 1; m.sampleMem()
      require(m.rounds <= maxRounds, s"WebPIE-sim exceeded $maxRounds rounds")
      val before = program.idbPreds.toSeq.sorted.map(store.count).sum
      val derivedByPred = scala.collection.mutable.Map.empty[String, DataFrame]
      for (rule <- program.rules) {
        val binds = RuleCompiler.bindings(rule, i => store(rule.body(i).pred)).persist()
        m.triggers += binds.count()
        val derived = RuleCompiler.projectHead(rule, binds, skolemSalt = rule.id)
        val p = rule.head.pred
        derivedByPred(p) =
          derivedByPred.get(p).map(_.unionByName(derived)).getOrElse(derived)
        binds.unpersist(false)
      }
      // one global dedup per round, MapReduce style
      for ((p, d) <- derivedByPred)
        store = store.updated(p,
          store(p).unionByName(d).dropDuplicates().localCheckpoint(true))
      val after = program.idbPreds.toSeq.sorted.map(store.count).sum
      changed = after != before
    }
    m.wallMs = (System.nanoTime() - t0) / 1000000L
    RunResult(store, m, program.idbPreds.toSeq.map(store.count).sum)
  }
}

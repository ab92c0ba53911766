package repro.chase

import org.apache.spark.sql.DataFrame
import repro.core.{Program, Rule}
import repro.exec.{FactStore, Metrics, RuleCompiler, RunResult}

/** The chase family (§3), as iterative Spark jobs over [[FactStore]]s.
  *
  * Three variants stand in for the paper's competitors (DESIGN.md):
  *
  *  - [[ChaseEngine.VLogSim]]   — semi-naive, restricted chase, redundancy
  *    filter right after each rule execution (VLog's schedule);
  *  - [[ChaseEngine.RDFoxSim]]  — semi-naive, Skolem chase, round-level
  *    dedup (RDFox's chase variant);
  *  - [[ChaseEngine.COMSim]]    — naive (non-semi-naive) Skolem chase: every
  *    round re-executes every rule over the whole instance.
  *
  * For Datalog programs all variants compute the same materialization and
  * differ only in schedule — exactly the paper's setting (§3, last ¶ of
  * the chase discussion).
  */
object ChaseEngine {

  sealed trait Variant { def name: String }
  case object VLogSim  extends Variant { val name = "VLog-sim" }
  case object RDFoxSim extends Variant { val name = "RDFox-sim" }
  case object COMSim   extends Variant { val name = "COM-sim" }

  /** Materializes (P, B) and returns the saturated store + metrics. */
  def run(program: Program, base: FactStore, variant: Variant,
          maxRounds: Int = 200): RunResult = {
    val m = new Metrics
    val t0 = System.nanoTime()
    val out = variant match {
      case COMSim => naive(program, base, m, maxRounds)
      case v      => semiNaive(program, base, m, maxRounds, restricted = v == VLogSim,
                               perRuleDedup = v == VLogSim)
    }
    m.wallMs = (System.nanoTime() - t0) / 1000000L
    val idb = program.idbPreds.toSeq.map(out.count).sum
    RunResult(out, m, idb)
  }

  /** Executes `rule` with extents chosen by `atomDf`, counts triggers,
    * applies the variant's null policy, and returns genuinely new facts.
    */
  private def executeRule(rule: Rule, atomDf: Int => DataFrame,
                          headExtent: DataFrame, restricted: Boolean,
                          m: Metrics): DataFrame = {
    val binds = RuleCompiler.bindings(rule, atomDf).persist()
    m.triggers += binds.count()
    val surviving =
      if (restricted && rule.existentials.nonEmpty)
        RuleCompiler.filterUnsatisfied(rule, binds, headExtent)
      else binds
    val derived = RuleCompiler.projectHead(rule, surviving, skolemSalt = rule.id)
    val fresh = RuleCompiler.newFacts(derived, headExtent).localCheckpoint(true)
    binds.unpersist(false)
    fresh
  }

  /** COM-sim: full re-execution each round, dedup per round. */
  private def naive(program: Program, base: FactStore, m: Metrics,
                    maxRounds: Int): FactStore = {
    var store = ensureIdb(program, base)
    var changed = true
    while (changed) {
      m.rounds += 1; m.sampleMem()
      require(m.rounds <= maxRounds, s"chase exceeded $maxRounds rounds")
      changed = false
      var next = store
      val touched = scala.collection.mutable.Set.empty[String]
      for (rule <- program.rules) {
        val fresh = executeRule(rule, i => store(rule.body(i).pred),
          next(rule.head.pred), restricted = false, m)
        if (fresh.count() > 0) {
          changed = true; touched += rule.head.pred
          next = dedupAdd(next, rule.head.pred, fresh)
        }
      }
      store = next.copy(dfs = next.dfs.map { case (p, df) =>
        p -> (if (touched(p)) df.localCheckpoint(true) else df)
      })
    }
    store
  }

  /** Semi-naive rounds: a rule fires once per IDB body position holding a
    * last-round delta; positions left of the delta see the pre-round
    * instance, positions right of it the post-round one — the textbook
    * decomposition that enumerates each new trigger exactly once.
    */
  private def semiNaive(program: Program, base: FactStore, m: Metrics,
                        maxRounds: Int, restricted: Boolean,
                        perRuleDedup: Boolean): FactStore = {
    var store = ensureIdb(program, base) // I^{k-1} at the top of round k
    var prev  = store                    // I^{k-2}
    // Round 1: every rule fires once over the base instance.
    var delta: Map[String, DataFrame] = null
    var changed = true
    while (changed) {
      m.rounds += 1; m.sampleMem()
      require(m.rounds <= maxRounds, s"chase exceeded $maxRounds rounds")
      changed = false
      val old = store
      var acc = store // grows within the round iff perRuleDedup
      val newDeltas = scala.collection.mutable.Map.empty[String, DataFrame]

      def fire(rule: Rule, atomDf: Int => DataFrame): Unit = {
        val headPred = rule.head.pred
        val against = if (perRuleDedup) acc(headPred) else old(headPred)
        val fresh0 = executeRule(rule, atomDf, against, restricted, m)
        // Round-level dedup still needs a filter vs this round's other rules.
        val fresh =
          if (perRuleDedup) fresh0
          else newDeltas.get(headPred) match {
            case Some(d) => RuleCompiler.newFacts(fresh0, d).localCheckpoint(true)
            case None    => fresh0
          }
        if (fresh.count() > 0) {
          changed = true
          newDeltas(headPred) =
            newDeltas.get(headPred).map(_.unionByName(fresh)).getOrElse(fresh)
          if (perRuleDedup) acc = dedupAdd(acc, headPred, fresh)
        }
      }

      for (rule <- program.rules) {
        val idbPositions = rule.body.zipWithIndex.collect {
          case (a, i) if program.idbPreds(a.pred) => i
        }
        if (m.rounds == 1) {
          // Only rules whose IDB positions can be satisfied fire in round 1
          // iff the base store already has those extents (it normally has
          // EDB only, so round 1 fires the extensional rules).
          if (idbPositions.forall(i => store.dfs.contains(rule.body(i).pred)))
            fire(rule, i => store(rule.body(i).pred))
        } else {
          for (j <- idbPositions if delta.contains(rule.body(j).pred)) {
            // i<j: I^{k-2}; i=j: Δ^{k-1}; i>j: I^{k-1} — each new trigger
            // is enumerated exactly once across the j-variants.
            fire(rule, i =>
              if (i == j) delta(rule.body(j).pred)
              else if (i < j) prev(rule.body(i).pred)
              else old(rule.body(i).pred))
          }
        }
      }

      if (!perRuleDedup)
        for ((p, d) <- newDeltas) acc = dedupAdd(acc, p, d)
      prev = old
      store = acc.copy(dfs = acc.dfs.map { case (p, df) =>
        p -> (if (newDeltas.contains(p)) df.localCheckpoint(true) else df)
      })
      delta = newDeltas.map { case (p, d) => p -> d.localCheckpoint(true) }.toMap
    }
    store
  }

  private def dedupAdd(store: FactStore, pred: String, fresh: DataFrame): FactStore =
    store.updated(pred, store(pred).unionByName(fresh))

  /** Registers arities for IDB predicates so empty extents resolve. */
  private def ensureIdb(program: Program, base: FactStore): FactStore =
    base.copy(arities = base.arities ++ program.arities)
}

package repro.tg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.exec.{FactStore, Metrics, RuleCompiler, RunResult}

/** TGmat (Alg. 2): interleaves instance-dependent TG construction (§4,
  * Def. 9 k-compatible node combinations) with TG-guided reasoning.
  *
  * Optimization modes match Table 3's columns:
  *  - [[TGDatalog.NoOpt]]: plain Def. 9 enumeration; a node's stored facts
  *    are its derivations minus I^{k-1} (GLog's round-level redundancy
  *    filter) and nodes that derive nothing new are pruned;
  *  - [[TGDatalog.M]]: + minDatalog (Def. 19): a candidate whose
  *    EG-rewriting is contained in that of an already-kept node with the
  *    same head predicate is dropped *before* any Spark work;
  *  - [[TGDatalog.MR]]: + the ruleExec strategy (Def. 23): before joining
  *    the body, one body atom covering all head variables is anti-joined
  *    against the already-derived head extent, shrinking the join input
  *    to instantiations that can still produce new conclusions.
  *
  * Existential (non-Datalog) rules are supported in NoOpt mode with the
  * restricted-chase satisfaction filter and per-node Skolem nulls — this
  * is the configuration the paper uses for ChaseBench (the §6
  * optimizations are Datalog-only, cf. appendix Table 8b).
  */
object TGDatalog {

  sealed trait Mode { def name: String }
  case object NoOpt extends Mode { val name = "no-opt" }
  case object M     extends Mode { val name = "m" }
  case object MR    extends Mode { val name = "m+r" }

  final case class TGmatRun(result: RunResult, graph: ExecGraph)

  /** Caps on driver-side graph bookkeeping; see DESIGN.md. */
  val RewritingCap = 48
  val CombosPerRuleCap = 128

  def run(program: Program, base: FactStore, mode: Mode,
          maxRounds: Int = 100): TGmatRun = {
    val m = new Metrics
    val t0 = System.nanoTime()
    var store = base.copy(arities = base.arities ++ program.arities)

    final case class Kept(node: TGNode, level: Int, facts: DataFrame)
    val kept = scala.collection.mutable.ArrayBuffer.empty[Kept]
    val factsOf = scala.collection.mutable.Map.empty[Int, DataFrame]
    val rewMemo = scala.collection.mutable.Map.empty[Int, Rewriter.Rewriting]
    var freshCnt = 0
    val freshVar = () => { freshCnt += 1; s"W$freshCnt" }
    var nextId = 0

    def rewOf(id: Int): Rewriter.Rewriting = rewMemo(id)
    def computeRew(n: TGNode): Rewriter.Rewriting =
      Rewriter.rewrite(n, rewOf, RewritingCap, freshVar)

    var level = 0
    var converged = false
    while (!converged && level < maxRounds) {
      level += 1
      m.rounds = level
      m.sampleMem()

      // ---- candidate generation (Def. 9 / §4 inductive step) ----------
      val candidates = scala.collection.mutable.ArrayBuffer.empty[TGNode]
      for (rule <- program.rules) {
        val idbPos = rule.body.zipWithIndex.collect {
          case (a, i) if program.idbPreds(a.pred) => i
        }
        if (level == 1) {
          if (idbPos.isEmpty)
            { candidates += TGNode(nextId, rule, rule.body.map(_ => None)); nextId += 1 }
        } else if (idbPos.nonEmpty) {
          val options: Vector[Vector[Kept]] = idbPos.toVector.map { i =>
            kept.filter(k => k.node.rule.head.pred == rule.body(i).pred &&
                             k.level <= level - 1).toVector
          }
          if (options.forall(_.nonEmpty)) {
            var emitted = 0
            def emit(chosen: Vector[Kept]): Unit =
              if (emitted < CombosPerRuleCap &&
                  chosen.exists(_.level == level - 1)) {
                val parents = Array.fill[Option[Int]](rule.body.size)(None)
                idbPos.zip(chosen).foreach { case (i, k) =>
                  parents(i) = Some(k.node.id)
                }
                candidates += TGNode(nextId, rule, parents.toVector); nextId += 1
                emitted += 1
              }
            def product(rem: Vector[Vector[Kept]], acc: Vector[Kept]): Unit =
              if (rem.isEmpty) emit(acc)
              else rem.head.foreach(k => product(rem.tail, acc :+ k))
            product(options, Vector.empty)
            if (emitted >= CombosPerRuleCap)
              Console.err.println(s"[TGmat] combo cap hit for rule ${rule.id} at level $level")
          }
        }
      }

      // ---- minDatalog (Def. 19) ---------------------------------------
      val toEval = scala.collection.mutable.ArrayBuffer.empty[TGNode]
      val tMin0 = System.nanoTime()
      val keptCandidateRews = scala.collection.mutable.ArrayBuffer.empty[(TGNode, CQ)]
      for (c <- candidates) {
        val rw = computeRew(c)
        rewMemo(c.id) = rw
        rw match {
          case Rewriter.EmptyRewriting => () // provably empty instance — drop
          case _ if mode == NoOpt => toEval += c
          case Rewriter.Oversized => toEval += c
          case Rewriter.Ok(cq) =>
            val subsumedByOld = kept.exists { k =>
              k.node.rule.head.pred == c.rule.head.pred &&
              (rewMemo(k.node.id) match {
                case Rewriter.Ok(cqU) => Containment.contained(cq, cqU)
                case _                => false
              })
            }
            val subsumedByNew = keptCandidateRews.exists { case (n, cqU) =>
              n.rule.head.pred == c.rule.head.pred && Containment.contained(cq, cqU)
            }
            if (!subsumedByOld && !subsumedByNew) {
              toEval += c
              keptCandidateRews += ((c, cq))
            }
        }
      }
      if (mode != NoOpt) m.minDatalogMs += (System.nanoTime() - tMin0) / 1000000L

      // ---- node evaluation (Def. 5 + Def. 23) -------------------------
      val roundAcc = scala.collection.mutable.Map.empty[String, DataFrame]
      def headExtent(pred: String): DataFrame =
        roundAcc.get(pred)
          .map(d => store(pred).unionByName(d))
          .getOrElse(store(pred))

      var anyNew = false
      for (node <- toEval) {
        val rule = node.rule
        val atomDf: Int => DataFrame = i => node.parents(i) match {
          case None    => store(rule.body(i).pred)
          case Some(u) => factsOf(u)
        }
        var parts = rule.body.zipWithIndex.map { case (a, i) =>
          RuleCompiler.atomBindings(a, atomDf(i), i.toString)
        }
        if (mode == MR && rule.isDatalog) {
          val tR0 = System.nanoTime()
          pruneCoveringAtom(rule, parts, headExtent(rule.head.pred)).foreach {
            case (i, pruned) => parts = parts.updated(i, pruned)
          }
          m.ruleExecMs += (System.nanoTime() - tR0) / 1000000L
        }
        val binds = parts.reduceLeft { (acc, next) =>
          val shared = acc.columns.toSet.intersect(next.columns.toSet).toSeq
          if (shared.isEmpty) acc.crossJoin(next) else acc.join(next, shared)
        }.persist()
        m.triggers += binds.count()
        val ext = headExtent(rule.head.pred)
        val surviving =
          if (rule.existentials.nonEmpty)
            RuleCompiler.filterUnsatisfied(rule, binds, ext)
          else binds
        val derived = RuleCompiler.projectHead(rule, surviving,
          skolemSalt = node.id.toLong * 1031L + rule.id)
        val fresh = RuleCompiler.newFacts(derived, ext).localCheckpoint(true)
        binds.unpersist(false)
        if (fresh.count() > 0) {
          anyNew = true
          kept += Kept(node, level, fresh)
          factsOf(node.id) = fresh
          val p = rule.head.pred
          roundAcc(p) = roundAcc.get(p).map(_.unionByName(fresh)).getOrElse(fresh)
        }
      }

      for ((p, d) <- roundAcc)
        store = store.updated(p, store(p).unionByName(d).localCheckpoint(true))
      converged = !anyNew
    }

    m.wallMs = (System.nanoTime() - t0) / 1000000L
    val graph = ExecGraph(program, kept.map(_.node).toVector)
    val idb = program.idbPreds.toSeq.map(store.count).sum
    TGmatRun(RunResult(store, m, idb), graph)
  }

  /** ruleExec (Def. 23) with the covering-atom instantiation described in
    * DESIGN.md: find a body atom whose variables cover all head variables,
    * compute the head keys it alone would produce, anti-join them against
    * the current head extent, and semi-join the surviving keys back to
    * shrink that atom's bindings before the body join runs.
    */
  def pruneCoveringAtom(rule: Rule, parts: Vector[DataFrame],
                        headExtent: DataFrame): Option[(Int, DataFrame)] = {
    val headVars = rule.head.vars.distinct
    if (headVars.isEmpty) return None
    val idx = rule.body.indexWhere(a => headVars.forall(a.varSet.contains))
    if (idx < 0) return None
    val part = parts(idx)

    // keys of existing head facts, expressed over the head's variables
    var ext = headExtent
    val firstPos = scala.collection.mutable.LinkedHashMap.empty[Var, Int]
    rule.head.terms.zipWithIndex.foreach {
      case (Cst(c), i) => ext = ext.filter(col(s"c$i") === lit(c))
      case (v: Var, i) =>
        firstPos.get(v) match {
          case Some(j) => ext = ext.filter(col(s"c$i") === col(s"c$j"))
          case None    => firstPos(v) = i
        }
    }
    val keyCols = firstPos.keys.map(RuleCompiler.varCol).toSeq
    val existingKeys = ext.select(firstPos.toSeq.map { case (v, i) =>
      col(s"c$i").as(RuleCompiler.varCol(v))
    }: _*)
    val newKeys = part.select(keyCols.map(col): _*).dropDuplicates()
      .join(existingKeys, keyCols, "left_anti")
    Some((idx, part.join(newKeys, keyCols, "left_semi")))
  }
}

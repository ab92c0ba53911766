package repro.exec

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core.{Atom, Cst, Rule, Var}

/** Compiles a rule into DataFrame operations (the repro_why mapping: each
  * trigger-graph node / chase rule execution is a filter/join/project
  * pipeline over fact tables).
  *
  * - [[bindings]]: body of the rule -> DataFrame of variable bindings
  *   (one column `v_<name>` per body variable) — its row count is exactly
  *   the paper's #triggers for this execution;
  * - [[projectHead]]: bindings -> derived head facts, Skolemizing
  *   existential variables into negative Longs;
  * - [[filterUnsatisfied]]: the restricted-chase satisfaction check as a
  *   left-anti join on the head's frontier positions.
  */
object RuleCompiler {

  def varCol(v: Var): String = s"v_${v.name}"

  /** Normalizes one body atom's extent: filters constants and repeated
    * variables, projects to `v_<var>` columns (one per distinct variable).
    * An all-constant atom becomes a 0/1-row guard with a dummy column.
    */
  def atomBindings(atom: Atom, df: DataFrame, guardTag: String): DataFrame = {
    var cur = df
    val firstPos = scala.collection.mutable.LinkedHashMap.empty[Var, Int]
    atom.terms.zipWithIndex.foreach {
      case (Cst(v), i) => cur = cur.filter(col(s"c$i") === lit(v))
      case (v: Var, i) =>
        firstPos.get(v) match {
          case Some(j) => cur = cur.filter(col(s"c$i") === col(s"c$j"))
          case None    => firstPos(v) = i
        }
    }
    if (firstPos.isEmpty) cur.limit(1).select(lit(1L).as(s"__guard_$guardTag"))
    else cur.select(firstPos.toSeq.map { case (v, i) => col(s"c$i").as(varCol(v)) }: _*)
  }

  /** Joins the body atoms left-to-right on shared variables. `atomDf(i)`
    * supplies the extent for body position i — the chase passes the full
    * instance or a semi-naive delta; TG reasoning passes the parent node's
    * facts (Def. 5).
    */
  def bindings(rule: Rule, atomDf: Int => DataFrame): DataFrame = {
    val parts = rule.body.zipWithIndex.map { case (a, i) =>
      atomBindings(a, atomDf(i), i.toString)
    }
    parts.reduceLeft { (acc, next) =>
      val shared = acc.columns.toSet.intersect(next.columns.toSet).toSeq
      if (shared.isEmpty) acc.crossJoin(next) else acc.join(next, shared)
    }
  }

  /** Skolem null for an existential variable: a strictly negative Long
    * functional in (salt, varIdx, frontier binding). `salt` separates
    * rules — and TG nodes, which must invent their own nulls (Def. 5).
    */
  private def skolemCol(salt: Long, varIdx: Int, frontierCols: Seq[Column]): Column =
    -(pmod(xxhash64((lit(salt) +: lit(varIdx) +: frontierCols): _*),
           lit(Long.MaxValue - 1)) + lit(1L))

  /** Projects bindings to head facts (columns c0..c{n-1}). */
  def projectHead(rule: Rule, binds: DataFrame, skolemSalt: Long): DataFrame = {
    val frontierCols = rule.frontier.map(v => col(varCol(v)))
    val exIdx = rule.existentials.zipWithIndex.toMap
    val cols = rule.head.terms.zipWithIndex.map {
      case (Cst(v), i) => lit(v).as(s"c$i")
      case (v: Var, i) =>
        exIdx.get(v) match {
          case Some(k) => skolemCol(skolemSalt, k, frontierCols).as(s"c$i")
          case None    => col(varCol(v)).as(s"c$i")
        }
    }
    binds.select(cols: _*)
  }

  /** Restricted-chase check (§3): drops the bindings whose head atom is
    * already satisfied in `headExtent`. Frontier/constant positions must
    * match; existential positions are free except that repeated
    * existential variables must coincide.
    */
  def filterUnsatisfied(rule: Rule, binds: DataFrame, headExtent: DataFrame): DataFrame = {
    val h = headExtent.toDF(headExtent.columns.map(c => s"h_$c"): _*)
    val exFirst = scala.collection.mutable.Map.empty[Var, Int]
    val conds = scala.collection.mutable.ArrayBuffer.empty[Column]
    rule.head.terms.zipWithIndex.foreach {
      case (Cst(v), i) => conds += (h(s"h_c$i") === lit(v))
      case (v: Var, i) if rule.bodyVars.contains(v) =>
        conds += (h(s"h_c$i") === binds(varCol(v)))
      case (v: Var, i) =>
        exFirst.get(v) match {
          case Some(j) => conds += (h(s"h_c$i") === h(s"h_c$j"))
          case None    => exFirst(v) = i
        }
    }
    val cond = conds.reduceOption(_ && _).getOrElse(lit(true))
    binds.join(h, cond, "left_anti")
  }

  /** `derived` minus `existing`, deduplicated — the round/rule-level
    * redundancy filter every engine shares.
    */
  def newFacts(derived: DataFrame, existing: DataFrame): DataFrame =
    derived.dropDuplicates().join(existing,
      derived.columns.toSeq, "left_anti")
}

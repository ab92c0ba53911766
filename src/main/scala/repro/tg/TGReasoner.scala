package repro.tg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Program
import repro.exec.{FactStore, Metrics, RuleCompiler, RunResult}

/** TG-guided reasoning over a *fixed* (instance-independent) TG — Def. 5
  * executed as a DAG of Spark jobs: each node's facts are the rule's head
  * projection over joins of its parents' DataFrames; the materialization
  * is B ∪ the union of all node instances.
  *
  * Two finishing modes, matching Table 2's columns:
  *  - w/o cleaning: node instances are unioned as-is (GLog's structure
  *    sharing analogue: no per-derivation redundancy work at all);
  *  - w/ cleaning: one collective pass at the end dedups every predicate
  *    and drops null-containing facts subsumed by null-free ones (the
  *    "logically redundant" facts of Example 2).
  */
object TGReasoner {

  final case class TGRun(result: RunResult, compMs: Long, reasonMs: Long,
                         cleanMs: Long, graph: ExecGraph)

  /** Computes and minimizes the TG, then reasons over it. */
  def materializeLinear(program: Program, base: FactStore,
                        clean: Boolean): TGRun = {
    val t0 = System.nanoTime()
    val g = TGLinear.minLinear(TGLinear.tglinear(program))
    val compMs = (System.nanoTime() - t0) / 1000000L
    reason(g, base, clean, compMs)
  }

  /** Reasons over an already-computed TG (Def. 5). */
  def reason(g: ExecGraph, base: FactStore, clean: Boolean,
             compMs: Long = 0L): TGRun = {
    val m = new Metrics
    val program = g.program
    val store0 = base.copy(arities = base.arities ++ program.arities)
    val t1 = System.nanoTime()

    val nodeFacts = scala.collection.mutable.Map.empty[Int, DataFrame]
    for (node <- g.topological) {
      val r = node.rule
      val atomDf: Int => DataFrame = i => node.parents(i) match {
        case None    => store0(r.body(i).pred)
        case Some(u) => nodeFacts(u)
      }
      val binds = RuleCompiler.bindings(r, atomDf).persist()
      m.triggers += binds.count()
      val facts = RuleCompiler
        .projectHead(r, binds, skolemSalt = node.id.toLong * 1031L + r.id)
        .localCheckpoint(true)
      binds.unpersist(false)
      m.sampleMem()
      nodeFacts(node.id) = facts
    }
    // Materialization = B ∪ ⋃_v v(B), grouped by predicate.
    var out = store0
    for ((id, df) <- nodeFacts) {
      val p = g.byId(id).rule.head.pred
      out = out.add(p, df)
    }
    val reasonMs = (System.nanoTime() - t1) / 1000000L


    val t2 = System.nanoTime()
    if (clean) {
      val shared = sharedNulls(out, program.idbPreds).localCheckpoint(true)
      for (p <- program.idbPreds if out.dfs.contains(p))
        out = out.updated(p, cleanExtent(out(p), shared).localCheckpoint(true))
    }
    val cleanMs = (System.nanoTime() - t2) / 1000000L

    m.rounds = g.depth + 1
    m.wallMs = reasonMs + cleanMs
    val idb = program.idbPreds.toSeq.map(p => out.count(p)).sum
    TGRun(RunResult(out, m, idb), compMs, reasonMs, cleanMs, g)
  }

  /** Nulls occurring in more than one fact across the IDB extents. A fact
    * whose null is shared cannot be dropped in isolation: the null might
    * witness a cross-predicate conjunctive query (Def. 12's preserving
    * condition, adapted to final cleaning).
    */
  def sharedNulls(store: FactStore, idbPreds: Set[String]): DataFrame = {
    val spark = store.spark
    val perExtent = idbPreds.toSeq.sorted.flatMap { p =>
      store.dfs.get(p).map { df =>
        val cols = df.columns
        // one row per (fact, null): within-fact repeats collapse
        df.select(lit(p).as("pred"), struct(cols.map(col): _*).as("fact"),
            explode(array(cols.map(col): _*)).as("n"))
          .filter(col("n") < 0).dropDuplicates()
          .select(col("n")) // arity-independent shape for the union
      }
    }
    if (perExtent.isEmpty)
      spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
        org.apache.spark.sql.types.StructType(Seq(
          org.apache.spark.sql.types.StructField("n",
            org.apache.spark.sql.types.LongType, nullable = false))))
    else
      perExtent.reduce(_ unionByName _)
        .groupBy("n").count().filter(col("count") > 1).select("n")
  }

  /** Collective redundancy elimination for one predicate: global distinct,
    * then drop facts whose nulls are all unshared and that are subsumed
    * by a null-free fact agreeing on their constant positions (with
    * repeated nulls mapped consistently). Sound: each removed fact has a
    * homomorphism into a kept fact and its nulls witness nothing else.
    * Not a full core computation — neither is GLog's cleaning.
    */
  def cleanExtent(df: DataFrame, shared: DataFrame): DataFrame = {
    val d = df.dropDuplicates()
    val cols = d.columns
    val withNulls = d.filter(cols.map(c => col(c) < 0).reduce(_ || _))
    val nullFree  = d.filter(cols.map(c => col(c) >= 0).reduce(_ && _))
    if (withNulls.isEmpty) d
    else {
      // facts touching a shared null are exempt from cleaning
      val exempt = cols.map { c =>
        withNulls.join(shared.withColumnRenamed("n", c), Seq(c), "left_semi")
      }.reduce(_ unionByName _).dropDuplicates()
      val candidates = withNulls.join(exempt, cols.toSeq, "left_anti")
      val g = nullFree.toDF(cols.map(c => s"g_$c"): _*)
      // f subsumed iff some null-free g matches f wherever f is a constant,
      // and positions sharing the same null in f are equal in g (the
      // mapping of each null must be a function).
      val posConds = cols.map(c => col(c) < 0 || col(c) === col(s"g_$c"))
      val nullConds = for {
        i <- cols.indices; j <- (i + 1) until cols.length
      } yield !(col(cols(i)) < 0 && col(cols(i)) === col(cols(j))) ||
              (col(s"g_${cols(i)}") === col(s"g_${cols(j)}"))
      val cond = (posConds ++ nullConds).reduce(_ && _)
      val kept = candidates.join(g, cond, "left_anti")
      nullFree.unionByName(exempt).unionByName(kept)
    }
  }

  /** Single-extent convenience used by unit tests. */
  def cleanExtent(df: DataFrame): DataFrame = {
    val spark = df.sparkSession
    val store = FactStore(spark, Map("p" -> df.columns.length), Map("p" -> df))
    cleanExtent(df, sharedNulls(store, Set("p")))
  }
}

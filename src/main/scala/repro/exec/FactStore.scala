package repro.exec

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{LongType, StructField, StructType}
import repro.core.{Fact, Hom, Program}

/** Per-predicate fact extents as Long-typed DataFrames.
  *
  * Column naming is positional (`c0..c{n-1}`), matching the paper's
  * positional rule syntax. The store is immutable; engines thread updated
  * copies through their round loops and are responsible for materializing
  * (checkpointing) growing extents.
  */
final case class FactStore(spark: SparkSession, arities: Map[String, Int],
                           dfs: Map[String, DataFrame]) {

  def schema(pred: String): StructType =
    FactStore.schemaOf(arities(pred))

  /** Extent of a predicate; empty (with the right schema) if absent. */
  def apply(pred: String): DataFrame =
    dfs.getOrElse(pred, FactStore.emptyDf(spark, arities(pred)))

  def updated(pred: String, df: DataFrame): FactStore =
    copy(dfs = dfs.updated(pred, df))

  /** Unions `df` into a predicate's extent (no dedup — caller's policy). */
  def add(pred: String, df: DataFrame): FactStore =
    updated(pred, apply(pred).unionByName(df.toDF(FactStore.cols(arities(pred)): _*)))

  def nonEmptyPreds: Set[String] = dfs.keySet

  def count(pred: String): Long = dfs.get(pred).map(_.count()).getOrElse(0L)

  def totalCount: Long = dfs.valuesIterator.map(_.count()).sum

  /** Collects everything into an in-memory instance (tests/oracle only). */
  def toInstance: Hom.Instance =
    dfs.map { case (p, df) =>
      p -> df.collect().map(r => Vector.tabulate(r.length)(r.getLong)).toSet
    }.filter(_._2.nonEmpty)

  /** Cuts lineage on every extent; call once per round in iterative loops. */
  def materialized: FactStore =
    copy(dfs = dfs.map { case (p, df) => p -> df.localCheckpoint(true) })
}

object FactStore {

  def cols(arity: Int): Seq[String] = (0 until arity).map(i => s"c$i")

  def schemaOf(arity: Int): StructType =
    StructType(cols(arity).map(c => StructField(c, LongType, nullable = false)))

  def emptyDf(spark: SparkSession, arity: Int): DataFrame =
    spark.createDataFrame(spark.sparkContext.emptyRDD[Row], schemaOf(arity))

  def empty(spark: SparkSession, arities: Map[String, Int]): FactStore =
    FactStore(spark, arities, Map.empty)

  /** Builds a store from in-memory facts (tests and small scenarios). */
  def fromFacts(spark: SparkSession, program: Program, facts: Seq[Fact]): FactStore = {
    val byPred = facts.groupBy(_.pred)
    val dfs = byPred.map { case (p, fs) =>
      val arity = program.arities.getOrElse(p, fs.head.args.size)
      val rows = fs.map(f => Row.fromSeq(f.args)).distinct
      p -> spark.createDataFrame(
        spark.sparkContext.parallelize(rows, math.max(1, rows.size / 5000 + 1)),
        schemaOf(arity))
    }
    FactStore(spark, program.arities ++ byPred.map { case (p, fs) => p -> fs.head.args.size },
      dfs)
  }
}

package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import repro.exec.FactStore
import repro.rdfs.RhoDF

/** Triple-encoded datasets for the ρDF scenarios (§7.4): everything is a
  * single ternary EDB relation t(s,p,o) plus schema triples using the
  * [[RhoDF]] vocabulary ids.
  */
object RdfsData {

  private def tripleStore(spark: SparkSession, schema: Seq[(Long, Long, Long)],
                          inst: DataFrame): FactStore = {
    val schemaDf = spark.createDataFrame(
      spark.sparkContext.parallelize(schema.map(t => Row(t._1, t._2, t._3)), 1),
      FactStore.schemaOf(3))
    FactStore(spark, Map("t" -> 3), Map("t" -> inst.toDF("c0", "c1", "c2").unionByName(schemaDf)))
  }

  // class/property vocabulary ids (≥ RhoDF.FirstFreeId)
  private val C0 = 100L // class ids C0..C0+nClasses
  private val P0 = 500L // property ids
  private val E0 = 100000L // entity ids

  /** LUBM as ρDF triples: a 12-class / 6-level university taxonomy, a
    * 4-property hierarchy with domain/range, and `scale` typed entities
    * with property edges.
    */
  def lubmRdf(spark: SparkSession, scale: Int): FactStore = {
    import spark.implicits._
    // subclass chain pairs: student->person etc. (tree of depth 4)
    val classes = 12
    val sc = (1 until classes).map(c => (C0 + c, RhoDF.SubClassOf, C0 + (c - 1) / 2))
    val sp = Seq((P0 + 1, RhoDF.SubPropOf, P0), (P0 + 2, RhoDF.SubPropOf, P0),
                 (P0 + 3, RhoDF.SubPropOf, P0 + 1))
    val domRng = Seq((P0, RhoDF.Domain, C0 + 1), (P0, RhoDF.Range, C0 + 2),
                     (P0 + 1, RhoDF.Domain, C0 + 3), (P0 + 2, RhoDF.Range, C0 + 5))
    val n = scale.toLong
    val ents = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
    val types = ents.select(($"id" + E0).as("c0"), lit(RhoDF.Type).as("c1"),
      (pmod($"id", lit((classes / 2).toLong)) + C0 + classes / 2).as("c2"))
    val edges = ents.select(($"id" + E0).as("c0"),
      (pmod($"id", lit(4L)) + P0 + 0).as("c1"),
      (pmod($"id" * 31 + 7, lit(n)) + E0).as("c2"))
    tripleStore(spark, sc ++ sp ++ domRng, types.unionByName(edges))
  }

  /** YAGO-lite: a deep taxonomy (chains of depth 16 — YAGO's WordNet
    * spine) with leaf-typed entities and few instance edges.
    */
  def yago(spark: SparkSession, scale: Int): FactStore = {
    import spark.implicits._
    val chains = 6
    val depth = 16
    val sc = for (ch <- 0 until chains; d <- 1 until depth)
      yield (C0 + ch * depth + d, RhoDF.SubClassOf, C0 + ch * depth + d - 1)
    val sp = Seq((P0 + 1, RhoDF.SubPropOf, P0))
    val domRng = Seq((P0, RhoDF.Domain, C0), (P0 + 1, RhoDF.Range, C0 + depth))
    val n = scale.toLong
    val ents = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
    val leafOf = pmod($"id", lit(chains.toLong)) * depth + (depth - 1) + C0
    val types = ents.select(($"id" + E0).as("c0"), lit(RhoDF.Type).as("c1"),
      leafOf.as("c2"))
    val edges = ents.filter($"id" % 4 === 0).select(($"id" + E0).as("c0"),
      (pmod($"id", lit(2L)) + P0).as("c1"),
      (pmod($"id" * 17 + 3, lit(n)) + E0).as("c2"))
    tripleStore(spark, sc ++ sp ++ domRng, types.unionByName(edges))
  }
}

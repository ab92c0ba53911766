package repro.data

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.{DatalogParser, Program, TermDict}
import repro.exec.FactStore

/** Synthetic substitutes for the paper's remaining ontology benchmarks
  * (§7.1). Each mirrors the structural trait that makes the original
  * interesting (DESIGN.md, dataset table): UOBM's denser links, DBpedia's
  * very wide shallow taxonomy (many rules), Claros' deep taxonomy with an
  * expensive LE closure, Reactome's linear existential rules.
  */
object OntoScenarios {

  // ------------------------------------------------------------- UOBM --
  /** UOBM-lite: LUBM-lite data + a cross-university friendship graph. */
  def uobmData(spark: SparkSession, nUniv: Int): FactStore = {
    import spark.implicits._
    val base = LubmLite.data(spark, nUniv)
    val spd = LubmLite.UGPD + LubmLite.GRPD
    val nPers = nUniv.toLong * LubmLite.DPU * spd
    // two pseudo-random friends per person, across universities
    val friend = spark.range(0, nPers * 2, 1, math.max(1, (nPers / 100000L).toInt + 1))
      .select((($"id" / 2).cast("long") + LubmLite.S0).as("c0"),
              (pmod($"id" * 2654435761L + 17, lit(nPers)) + LubmLite.S0).as("c1"))
    base.copy(arities = base.arities + ("friend" -> 2),
              dfs = base.dfs + ("friend" -> friend.toDF("c0", "c1")))
  }

  private val uobmLiText = """
    Friend(X,Y) :- friend(X,Y)
    Person(X) :- friend(X,Y)
    Person(Y) :- friend(X,Y)
    SocialPerson(X) :- Friend(X,Y)
  """
  private val uobmLText = """
    Friend(Y,X) :- Friend(X,Y)
    FoF(X,Z) :- Friend(X,Y), Friend(Y,Z)
    SameDeptFriend(X,Y) :- Friend(X,Y), MemberOf(X,D), MemberOf(Y,D)
  """
  /** UOBM-LI: LUBM-LI + linear friendship rules. */
  lazy val uobmLi: Program =
    concat(LubmLite.li, DatalogParser.parse(uobmLiText, new TermDict))
  /** UOBM-L: LUBM-L + symmetric friendship and friend-of-friend joins. */
  lazy val uobmL: Program =
    concat(LubmLite.l, DatalogParser.parse(uobmLiText + uobmLText, new TermDict))

  /** Concatenates programs, reassigning rule ids to stay unique. */
  def concat(ps: Program*): Program =
    Program(ps.flatMap(_.rules).zipWithIndex.map { case (r, i) => r.copy(id = i) }.toVector)

  // ---------------------------------------------------------- DBpedia --
  /** DBpedia-lite: a wide auto-generated taxonomy — `nClasses` classes in
    * a shallow random tree and `nProps` properties with domain/range,
    * yielding ~2·classes + 3·props linear rules (the paper's DBpedia has
    * thousands; rule *count*, not content, is the trait that matters).
    */
  val DbpClasses = 32
  val DbpProps = 16

  def dbpediaProgram(joins: Boolean): Program = {
    val rnd = new scala.util.Random(7)
    val sb = new StringBuilder
    // class tree: parent(c) random among smaller indices (wide + shallow)
    for (c <- 1 until DbpClasses)
      sb ++= s"Class${rnd.nextInt(c)}(X) :- Class$c(X)\n"
    for (c <- 0 until DbpClasses)
      sb ++= s"Class$c(X) :- inst$c(X)\n"
    for (p <- 0 until DbpProps) {
      val dom = rnd.nextInt(DbpClasses); val rng = rnd.nextInt(DbpClasses)
      sb ++= s"Prop$p(X,Y) :- edge$p(X,Y)\n"
      sb ++= s"Class$dom(X) :- Prop$p(X,Y)\n"
      sb ++= s"Class$rng(Y) :- Prop$p(X,Y)\n"
    }
    if (joins) {
      sb ++= s"Linked(X,Z) :- Prop0(X,Y), Prop1(Y,Z)\n"
      sb ++= s"Linked(X,Z) :- Linked(X,Y), Prop2(Y,Z)\n"
      sb ++= s"Hub(X) :- Linked(X,Y), Class3(Y)\n"
    }
    DatalogParser.parse(sb.toString, new TermDict)
  }

  lazy val dbpediaLi: Program = dbpediaProgram(joins = false)
  lazy val dbpediaL: Program = dbpediaProgram(joins = true)

  /** `scale` entities spread over the leaf classes + sparse prop edges. */
  def dbpediaData(spark: SparkSession, scale: Int): FactStore = {
    import spark.implicits._
    val n = scale.toLong
    val ents = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
    val dfs = scala.collection.mutable.Map.empty[String, org.apache.spark.sql.DataFrame]
    for (c <- 0 until DbpClasses)
      dfs(s"inst$c") = ents.filter(pmod($"id", lit(DbpClasses.toLong)) === c)
        .select(($"id" + 1000L).as("c0"))
    for (p <- 0 until DbpProps) {
      // ~n/(props) edges per property, pseudo-random endpoints
      dfs(s"edge$p") = ents.filter(pmod($"id" + p, lit(DbpProps.toLong)) === 0)
        .select(($"id" + 1000L).as("c0"),
                (pmod($"id" * 48271 + p * 31, lit(n)) + 1000L).as("c1"))
    }
    FactStore(spark, dfs.map { case (k, df) => k -> df.columns.length }.toMap, dfs.toMap)
  }

  // ----------------------------------------------------------- Claros --
  /** Claros-lite: two deep subclass chains (depth 14) over art-object
    * classes plus a `related` graph of small cycles; L adds the
    * transitive closure of `related`, LE adds symmetry first — which
    * closes every cycle into a clique (the paper's Claros-LE blowup).
    */
  val ClarosDepth = 14
  val ClarosCycle = 12L

  private def clarosChains(sb: StringBuilder): Unit = {
    for (chain <- 0 until 2; d <- 1 until ClarosDepth)
      sb ++= s"C${chain}_${d - 1}(X) :- C${chain}_$d(X)\n"
    for (chain <- 0 until 2)
      sb ++= s"C${chain}_${ClarosDepth - 1}(X) :- leaf$chain(X)\n"
    sb ++= "Object(X) :- C0_0(X)\n"
    sb ++= "Object(X) :- C1_0(X)\n"
    sb ++= "Related(X,Y) :- related(X,Y)\n"
    sb ++= "Object(X) :- related(X,Y)\n"
    sb ++= "Object(Y) :- related(X,Y)\n"
  }

  lazy val clarosLi: Program = {
    val sb = new StringBuilder; clarosChains(sb)
    DatalogParser.parse(sb.toString, new TermDict)
  }
  lazy val clarosL: Program = {
    val sb = new StringBuilder; clarosChains(sb)
    sb ++= "Related(X,Z) :- Related(X,Y), Related(Y,Z)\n"
    sb ++= "Connected(X) :- Related(X,Y), Object(Y)\n"
    DatalogParser.parse(sb.toString, new TermDict)
  }
  lazy val clarosLe: Program = {
    val sb = new StringBuilder; clarosChains(sb)
    sb ++= "Related(Y,X) :- Related(X,Y)\n"
    sb ++= "Related(X,Z) :- Related(X,Y), Related(Y,Z)\n"
    sb ++= "Connected(X) :- Related(X,Y), Object(Y)\n"
    DatalogParser.parse(sb.toString, new TermDict)
  }

  def clarosData(spark: SparkSession, scale: Int): FactStore = {
    import spark.implicits._
    val n = scale.toLong
    val ents = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
    val leaf0 = ents.filter($"id" % 2 === 0).select(($"id" + 500L).as("c0"))
    val leaf1 = ents.filter($"id" % 2 === 1).select(($"id" + 500L).as("c0"))
    // `related` forms disjoint directed paths of length ClarosCycle:
    // the L closure is the (i<j) half; LE's symmetry closes each path
    // into a full clique — the Claros-LE blowup trait.
    val related = ents.filter(pmod($"id", lit(ClarosCycle)) =!= (ClarosCycle - 1))
      .select(($"id" + 500L).as("c0"), ($"id" + 501L).as("c1"))
    FactStore(spark,
      Map("leaf0" -> 1, "leaf1" -> 1, "related" -> 2),
      Map("leaf0" -> leaf0.toDF("c0"), "leaf1" -> leaf1.toDF("c0"),
          "related" -> related.toDF("c0", "c1")))
  }

  // --------------------------------------------------------- Reactome --
  /** Reactome-lite: linear rules with existentials (the paper's only
    * linear scenario whose program is not plain Datalog).
    */
  lazy val reactomeLi: Program = DatalogParser.parse("""
    Event(X) :- reaction(X)
    Process(X) :- Event(X)
    PhysicalEntity(X) :- complex(X)
    PhysicalEntity(X) :- protein(X)
    Entity(X) :- PhysicalEntity(X)
    Participant(X,Y) :- participates(X,Y)
    Event(Y) :- Participant(X,Y)
    Entity(X) :- Participant(X,Y)
    HasComponent(X,Z) :- complex(X)
    Component(Y) :- HasComponent(X,Y)
    PhysicalEntity(Y) :- HasComponent(X,Y)
    CatalyzedBy(X,W) :- reaction(X)
    Catalyst(Y) :- CatalyzedBy(X,Y)
    Entity(Y) :- CatalyzedBy(X,Y)
  """, new TermDict)

  def reactomeData(spark: SparkSession, scale: Int): FactStore = {
    import spark.implicits._
    val n = scale.toLong
    val ents = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
    val reaction = ents.filter($"id" % 3 === 0).select(($"id" + 100L).as("c0"))
    val complexD = ents.filter($"id" % 3 === 1).select(($"id" + 100L).as("c0"))
    val protein = ents.filter($"id" % 3 === 2).select(($"id" + 100L).as("c0"))
    // each protein participates in some reaction
    val participates = ents.filter($"id" % 3 === 2)
      .select(($"id" + 100L).as("c0"),
              (($"id" - ($"id" % 3) - 2 + 100L)).as("c1"))
    FactStore(spark,
      Map("reaction" -> 1, "complex" -> 1, "protein" -> 1, "participates" -> 2),
      Map("reaction" -> reaction.toDF("c0"), "complex" -> complexD.toDF("c0"),
          "protein" -> protein.toDF("c0"),
          "participates" -> participates.toDF("c0", "c1")))
  }
}

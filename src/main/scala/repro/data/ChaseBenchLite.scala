package repro.data

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.{DatalogParser, Program, TermDict}
import repro.exec.FactStore

/** Synthetic substitute for the ChaseBench iBench scenarios (§7.1):
  * source-to-target tgds with existential variables and multi-atom joins.
  * A template of employees/departments/projects mappings is instantiated
  * `copies` times over renamed source relations, matching how iBench
  * scales STB-128/ONT-256 by replicating mapping patterns. The ONT
  * variant adds recursive target-to-target rules (manager chains), which
  * is the trait the paper highlights ("highly recursive").
  *
  * Multi-atom-head tgds are pre-normalized into single-head rules through
  * auxiliary predicates (preserves certain answers; see DESIGN.md).
  */
object ChaseBenchLite {

  private def template(k: Int, recursive: Boolean): String = {
    val s = s"_$k"
    val base = s"""
      TEmp$s(E,D) :- emp$s(E,D)
      TDept$s(D,M) :- dept$s(D,M)
      TMgr$s(E,M) :- emp$s(E,D), dept$s(D,M)
      TProjDept$s(P,D,M) :- proj$s(P,D), dept$s(D,M)
      Badge$s(E,B) :- emp$s(E,D)
      BadgeOf$s(B,E) :- Badge$s(E,B)
      Located$s(P,L) :- proj$s(P,D)
      Location$s(L) :- Located$s(P,L)
      Role$s(E,P,R) :- assign$s(E,P), proj$s(P,D)
      RoleName$s(R) :- Role$s(E,P,R)
      Staff$s(E) :- TEmp$s(E,D)
      Team$s(E,F) :- assign$s(E,P), assign$s(F,P)
    """
    val rec = s"""
      TRep$s(E,M) :- TMgr$s(E,M)
      TRep$s(E,M2) :- TRep$s(E,M), TMgr$s(M,M2)
      SameLoc$s(P,Q) :- Located$s(P,L), Located$s(Q,L)
    """
    if (recursive) base + rec else base
  }

  def program(copies: Int, recursive: Boolean): Program = {
    val text = (0 until copies).map(template(_, recursive)).mkString("\n")
    DatalogParser.parse(text, new TermDict)
  }

  /** STB-128-lite: non-recursive existential mappings. */
  lazy val stb: Program = program(copies = 5, recursive = false)
  /** ONT-256-lite: more copies + recursive target rules. */
  lazy val ont: Program = program(copies = 7, recursive = true)

  /** `scale` rows per source relation per copy. Managers form chains so
    * the ONT recursion has real depth.
    */
  def data(spark: SparkSession, copies: Int, scale: Int): FactStore = {
    import spark.implicits._
    val n = scale.toLong
    val nDept = math.max(2L, n / 10)
    val dfs = scala.collection.mutable.Map.empty[String, org.apache.spark.sql.DataFrame]
    for (k <- 0 until copies) {
      val off = 1000000L * (k + 1)
      val ids = spark.range(0, n, 1, math.max(1, (n / 200000L).toInt + 1))
      val deptIds = spark.range(0, nDept, 1, math.max(1, (nDept / 200000L).toInt + 1))
      dfs(s"emp_$k") = ids.select(($"id" + off).as("c0"),
        (pmod($"id", lit(nDept)) + off + 500000L).as("c1"))
      // manager of dept d is employee of dept d+1 — chains for TRep
      dfs(s"dept_$k") = deptIds.select(($"id" + off + 500000L).as("c0"),
        (pmod($"id" + 1, lit(nDept)) * 10 + off).as("c1"))
      dfs(s"proj_$k") = ids.filter($"id" % 3 === 0)
        .select(($"id" + off + 700000L).as("c0"),
                (pmod($"id" * 7, lit(nDept)) + off + 500000L).as("c1"))
      dfs(s"assign_$k") = ids.filter($"id" % 2 === 0)
        .select(($"id" + off).as("c0"),
                (($"id" - pmod($"id", lit(3L))) + off + 700000L).as("c1"))
    }
    FactStore(spark, dfs.map { case (p, df) => p -> df.columns.length }.toMap, dfs.toMap)
  }
}

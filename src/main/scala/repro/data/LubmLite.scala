package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{DatalogParser, Program, TermDict}
import repro.exec.FactStore

/** Synthetic substitute for the LUBM benchmark (§7.1), parameterized by
  * the number of universities like the original generator. Entities live
  * in disjoint Long id spaces; every extent is a `c0[,c1]` Long DataFrame.
  *
  * Rulesets mirror the paper's LI ⊂ L ⊂ LE ladder: LI is the linear
  * fragment of the OWL-to-Datalog translation (class/property hierarchy +
  * domain/range), L adds the recursive join rules (subOrganizationOf⁺,
  * memberOf propagation, teacherOf), LE adds the symmetric+transitive
  * `Colleague` rules that mimic the owl:sameAs-style blowup of the
  * paper's LE programs.
  */
object LubmLite {

  // structure per university
  val DPU = 10  // departments
  val FPD = 8   // faculty per dept (2 full, 3 assoc, 3 lecturers)
  val UGPD = 30 // undergrad students per dept
  val GRPD = 10 // grad students per dept
  val CPD = 12  // courses per dept (last 3 are grad courses)
  val PubPD = 10
  val GrpPD = 2 // research groups per dept

  // id spaces
  val U0 = 10L
  val D0 = 1000000L
  val G0 = 2000000L
  val F0 = 10000000L
  val S0 = 100000000L
  val C0 = 400000000L
  val P0 = 600000000L

  /** Base instance at `nUniv` universities (≈1.5k facts per university). */
  def data(spark: SparkSession, nUniv: Int): FactStore = {
    import spark.implicits._
    val nDept = nUniv.toLong * DPU
    def parts(n: Long) = math.max(1, (n / 200000L).toInt + 1)

    def unary(df: DataFrame) = df.toDF("c0")
    def binary(df: DataFrame) = df.toDF("c0", "c1")

    val univ = unary(spark.range(nUniv).select(($"id" + U0).as("c0")))
    val deptIdx = spark.range(0, nDept, 1, parts(nDept))
    val dept = unary(deptIdx.select(($"id" + D0).as("c0")))
    val subOrgDept = binary(deptIdx.select(($"id" + D0).as("c0"),
      (($"id" / DPU).cast("long") + U0).as("c1")))
    val groups = spark.range(0, nDept * GrpPD, 1, parts(nDept * GrpPD))
    val subOrgGrp = binary(groups.select(($"id" + G0).as("c0"),
      (($"id" / GrpPD).cast("long") + D0).as("c1")))

    val fac = spark.range(0, nDept * FPD, 1, parts(nDept * FPD))
      .select(($"id" + F0).as("fid"), ($"id" % FPD).as("k"),
              (($"id" / FPD).cast("long") + D0).as("did"))
    val fullProf = unary(fac.filter($"k" < 2).select($"fid"))
    val assocProf = unary(fac.filter($"k" >= 2 && $"k" < 5).select($"fid"))
    val lecturer = unary(fac.filter($"k" >= 5).select($"fid"))
    val worksFor = binary(fac.select($"fid", $"did"))
    val headOf = binary(fac.filter($"k" === 0).select($"fid", $"did"))

    val spd = UGPD + GRPD
    val stud = spark.range(0, nDept * spd, 1, parts(nDept * spd))
      .select(($"id" + S0).as("sid"), ($"id" % spd).as("k"),
              ($"id" / spd).cast("long").as("d"))
    val ugStudent = unary(stud.filter($"k" < UGPD).select($"sid"))
    val gradStudent = unary(stud.filter($"k" >= UGPD).select($"sid"))
    // each student takes 2 courses of their department
    val takes = binary(stud.select($"sid", explode(array(lit(0), lit(1))).as("j"),
        $"d", $"k")
      .select($"sid", ($"d" * CPD + pmod($"k" * 7 + $"j", lit(CPD)) + C0).as("cid")))
    val advisor = binary(stud.filter($"k" >= UGPD)
      .select($"sid", ($"d" * FPD + pmod($"k", lit(FPD)) + F0).as("fid")))
    val degreeFrom = binary(stud.filter($"k" >= UGPD)
      .select($"sid", (pmod($"sid" * 13, lit(nUniv.toLong)) + U0).as("uid")))

    val crs = spark.range(0, nDept * CPD, 1, parts(nDept * CPD))
      .select(($"id" + C0).as("cid"), ($"id" % CPD).as("k"),
              ($"id" / CPD).cast("long").as("d"))
    val course = unary(crs.filter($"k" < CPD - 3).select($"cid"))
    val gradCourse = unary(crs.filter($"k" >= CPD - 3).select($"cid"))
    val teaches = binary(crs.select(($"d" * FPD + pmod($"k", lit(FPD)) + F0).as("fid"),
      $"cid"))

    val pubs = spark.range(0, nDept * PubPD, 1, parts(nDept * PubPD))
      .select(($"id" + P0).as("pid"), ($"id" % PubPD).as("k"),
              ($"id" / PubPD).cast("long").as("d"))
    // two authors per publication: a faculty member and a grad student
    val pubAuthor = binary(
      pubs.select($"pid", ($"d" * FPD + pmod($"k", lit(FPD)) + F0).as("a"))
        .unionByName(pubs.select($"pid",
          ($"d" * spd + UGPD + pmod($"k", lit(GRPD)) + S0).as("a"))))

    val dfs = Map(
      "univ" -> univ, "dept" -> dept, "sub_org" -> subOrgDept.unionByName(subOrgGrp),
      "full_prof" -> fullProf, "assoc_prof" -> assocProf, "lecturer" -> lecturer,
      "works_for" -> worksFor, "head_of" -> headOf,
      "ug_student" -> ugStudent, "grad_student" -> gradStudent,
      "takes" -> takes, "advisor" -> advisor, "degree_from" -> degreeFrom,
      "course" -> course, "grad_course" -> gradCourse, "teaches" -> teaches,
      "pub_author" -> pubAuthor,
    )
    val arities = dfs.map { case (p, df) => p -> df.columns.length }
    FactStore(spark, arities, dfs)
  }

  private val liText = """
    Student(X) :- ug_student(X)
    Student(X) :- grad_student(X)
    Professor(X) :- full_prof(X)
    Professor(X) :- assoc_prof(X)
    Faculty(X) :- Professor(X)
    Faculty(X) :- lecturer(X)
    Person(X) :- Student(X)
    Person(X) :- Faculty(X)
    Course(X) :- course(X)
    Course(X) :- grad_course(X)
    Organization(X) :- dept(X)
    Organization(X) :- univ(X)
    WorksFor(X,Y) :- works_for(X,Y)
    WorksFor(X,Y) :- head_of(X,Y)
    HeadOf(X,Y) :- head_of(X,Y)
    SubOrg(X,Y) :- sub_org(X,Y)
    MemberOf(X,Y) :- WorksFor(X,Y)
    Takes(X,Y) :- takes(X,Y)
    Employee(X) :- WorksFor(X,Y)
    Person(X) :- Employee(X)
    Person(X) :- advisor(X,Y)
    Professor(Y) :- advisor(X,Y)
    Course(Y) :- Takes(X,Y)
    Organization(Y) :- WorksFor(X,Y)
    Publication(X) :- pub_author(X,Y)
    Person(Y) :- pub_author(X,Y)
    Alumnus(X) :- degree_from(X,Y)
  """

  private val lExtraText = """
    SubOrg(X,Z) :- SubOrg(X,Y), SubOrg(Y,Z)
    MemberOf(X,Z) :- MemberOf(X,Y), SubOrg(Y,Z)
    TeacherOf(P,S) :- teaches(P,C), Takes(S,C)
    Advises(P,S) :- advisor(S,P)
    CoAuthor(X,Y) :- pub_author(P,X), pub_author(P,Y)
    GradTeacher(P) :- teaches(P,C), grad_course(C)
  """

  private val leExtraText = """
    Colleague(X,Y) :- WorksFor(X,D), WorksFor(Y,D)
    Colleague(X,Y) :- Colleague(Y,X)
    Colleague(X,Z) :- Colleague(X,Y), Colleague(Y,Z)
    SameUnivAlum(X,U) :- degree_from(X,U)
    MemberOf(X,U) :- SameUnivAlum(X,U)
  """

  lazy val li: Program = DatalogParser.parse(liText, new TermDict)
  lazy val l: Program = DatalogParser.parse(liText + lExtraText, new TermDict)
  lazy val le: Program = DatalogParser.parse(liText + lExtraText + leExtraText, new TermDict)
}

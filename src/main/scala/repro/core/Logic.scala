package repro.core

/** First-order logic vocabulary of the paper (§3).
  *
  * Terms are Long-encoded: constants are non-negative, labelled nulls are
  * strictly negative. Variables only occur inside rules/queries, never in
  * facts. This encoding keeps fact extents as narrow Long-typed DataFrames
  * and makes Skolem-chase dedup plain value equality.
  */
sealed trait Term extends Product with Serializable

/** A rule/query variable, e.g. X, Y. */
final case class Var(name: String) extends Term {
  override def toString: String = name
}

/** A ground term: constant if value >= 0, labelled null if value < 0. */
final case class Cst(value: Long) extends Term {
  def isNull: Boolean = value < 0
  override def toString: String = if (isNull) s"n${-value}" else s"c$value"
}

/** An atom p(t1,...,tn). Facts are atoms whose terms are all ground. */
final case class Atom(pred: String, terms: Vector[Term]) {
  def arity: Int = terms.size
  def vars: Vector[Var] = terms.collect { case v: Var => v }
  def varSet: Set[Var] = vars.toSet
  def isGround: Boolean = terms.forall(_.isInstanceOf[Cst])
  override def toString: String = s"$pred(${terms.mkString(",")})"
}

/** A ground fact as stored in instances: predicate + Long argument tuple. */
final case class Fact(pred: String, args: Vector[Long]) {
  def hasNulls: Boolean = args.exists(_ < 0)
  override def toString: String =
    s"$pred(${args.map(a => if (a < 0) s"n${-a}" else a.toString).mkString(",")})"
}

object Fact {
  def fromAtom(a: Atom): Fact = {
    require(a.isGround, s"not ground: $a")
    Fact(a.pred, a.terms.map { case Cst(v) => v; case t => sys.error(s"var $t") })
  }
}

/** A rule body(r) -> head(r), form (1) of §3: single head atom, head
  * variables not occurring in the body are existentially quantified.
  */
final case class Rule(id: Int, body: Vector[Atom], head: Atom) {
  require(body.nonEmpty, "empty body")

  lazy val bodyVars: Set[Var] = body.flatMap(_.vars).toSet
  /** Frontier: universally quantified head variables (occur in the body). */
  lazy val frontier: Vector[Var] = head.vars.distinct.filter(bodyVars.contains)
  /** Existentially quantified head variables. */
  lazy val existentials: Vector[Var] = head.vars.distinct.filterNot(bodyVars.contains)

  def isDatalog: Boolean = existentials.isEmpty
  def isLinear: Boolean = body.size == 1

  override def toString: String = s"[$id] ${body.mkString(" & ")} -> $head"
}

/** A finite set of rules (§3). EDB predicates are those never derived by a
  * head; everything else is IDB.
  */
final case class Program(rules: Vector[Rule]) {
  lazy val idbPreds: Set[String] = rules.map(_.head.pred).toSet
  lazy val edbPreds: Set[String] =
    rules.flatMap(_.body.map(_.pred)).toSet -- idbPreds
  lazy val allPreds: Set[String] = idbPreds ++ edbPreds

  /** Arity of every predicate mentioned by the program. */
  lazy val arities: Map[String, Int] = {
    val m = scala.collection.mutable.Map.empty[String, Int]
    for (r <- rules; a <- r.body :+ r.head) {
      m.get(a.pred).foreach(n => require(n == a.arity, s"arity clash for ${a.pred}"))
      m(a.pred) = a.arity
    }
    m.toMap
  }

  def isDatalog: Boolean = rules.forall(_.isDatalog)
  def isLinear: Boolean = rules.forall(_.isLinear)
  /** Rules whose body is extensional-only (§4 base step executes these). */
  def extensionalRules: Vector[Rule] = rules.filter(_.body.forall(a => edbPreds(a.pred)))

  override def toString: String = rules.mkString("\n")
}

object Program {
  /** Builds a program assigning fresh consecutive rule ids. */
  def apply(rs: Seq[(Vector[Atom], Atom)]): Program =
    Program(rs.zipWithIndex.map { case ((b, h), i) => Rule(i, b, h) }.toVector)
}

/** Interning dictionary between human-readable constant names and Longs.
  * Used by the parser, the data generators and the tests; engines only see
  * Longs.
  */
final class TermDict extends Serializable {
  private val toId = scala.collection.mutable.HashMap.empty[String, Long]
  private val toName = scala.collection.mutable.ArrayBuffer.empty[String]

  def intern(name: String): Long = synchronized {
    toId.getOrElseUpdate(name, { toName += name; toName.size - 1L })
  }
  def name(id: Long): String =
    if (id < 0) s"_:n${-id}"
    else if (id < toName.size) toName(id.toInt)
    else s"c$id"
  def size: Int = toName.size
}

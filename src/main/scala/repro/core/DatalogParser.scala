package repro.core

/** Tiny concrete syntax for programs, used by tests and scenario builders.
  *
  * One rule per line:  `Head(X,Z) :- Body1(X,Y), Body2(Y,Z).`
  *   - tokens starting with an upper-case letter are variables;
  *   - any other token (lower-case identifier or digits) is a constant,
  *     interned through the supplied [[TermDict]];
  *   - head variables absent from the body are existentially quantified;
  *   - `%` starts a comment; blank lines are skipped.
  *
  * Predicate case follows the paper's convention (lowercase extensional,
  * uppercase intensional) but nothing enforces it — EDB/IDB is derived
  * from head positions by [[Program]].
  */
object DatalogParser {

  private val AtomRe = """\s*([A-Za-z_][\w']*)\s*\(([^)]*)\)\s*""".r

  def parseAtom(s: String, dict: TermDict): Atom = s match {
    case AtomRe(pred, args) =>
      val terms = args.split(",").toVector.filter(_.trim.nonEmpty).map(parseTerm(_, dict))
      Atom(pred, terms)
    case _ => sys.error(s"cannot parse atom: '$s'")
  }

  def parseTerm(s: String, dict: TermDict): Term = {
    val t = s.trim
    if (t.headOption.exists(_.isUpper)) Var(t)
    else if (t.forall(_.isDigit)) Cst(t.toLong)
    else Cst(dict.intern(t))
  }

  /** Parses a single rule `head :- a1, ..., an` (trailing '.' optional). */
  def parseRule(line: String, id: Int, dict: TermDict): Rule = {
    val cleaned = line.trim.stripSuffix(".")
    val parts = cleaned.split(":-")
    require(parts.length == 2, s"cannot parse rule: '$line'")
    val head = parseAtom(parts(0), dict)
    // split body on commas that are outside parentheses
    val body = splitTopLevel(parts(1)).map(parseAtom(_, dict)).toVector
    Rule(id, body, head)
  }

  private def splitTopLevel(s: String): Seq[String] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[String]
    val cur = new StringBuilder
    var depth = 0
    for (c <- s) c match {
      case '(' => depth += 1; cur += c
      case ')' => depth -= 1; cur += c
      case ',' if depth == 0 => out += cur.toString; cur.clear()
      case _ => cur += c
    }
    if (cur.toString.trim.nonEmpty) out += cur.toString
    out.toSeq
  }

  /** Parses a whole program (one rule per line). */
  def parse(text: String, dict: TermDict = new TermDict): Program = {
    val lines = text.linesIterator
      .map(_.takeWhile(_ != '%').trim)
      .filter(_.nonEmpty)
      .toVector
    Program(lines.zipWithIndex.map { case (l, i) => parseRule(l, i, dict) })
  }

  /** Parses ground facts `p(a,b)`, one per line. */
  def parseFacts(text: String, dict: TermDict): Vector[Fact] =
    text.linesIterator
      .map(_.takeWhile(_ != '%').trim)
      .filter(_.nonEmpty)
      .map(l => Fact.fromAtom(parseAtom(l, dict)))
      .toVector
}

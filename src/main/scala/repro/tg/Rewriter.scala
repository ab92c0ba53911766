package repro.tg

import repro.core._

/** A conjunctive query (§3): used for EG-rewritings and containment. */
final case class CQ(head: Atom, body: Vector[Atom]) {
  def size: Int = body.size
  override def toString: String = s"$head <- ${body.mkString(" & ")}"
}

/** Syntactic unification of Datalog atoms (no function symbols). */
object Unify {

  type Subst = Map[Var, Term]

  def apply(s: Subst, t: Term): Term = t match {
    case v: Var => s.get(v).map(apply(s, _)).getOrElse(v)
    case c      => c
  }
  def apply(s: Subst, a: Atom): Atom = a.copy(terms = a.terms.map(apply(s, _)))

  /** MGU of two atoms, or None if they don't unify (§3). */
  def mgu(a: Atom, b: Atom): Option[Subst] = {
    if (a.pred != b.pred || a.arity != b.arity) return None
    var s: Subst = Map.empty
    for ((ta, tb) <- a.terms.zip(b.terms)) {
      (apply(s, ta), apply(s, tb)) match {
        case (x, y) if x == y          => ()
        case (v: Var, t)               => s = s.updated(v, t)
        case (t, v: Var)               => s = s.updated(v, t)
        case (Cst(_), Cst(_))          => return None
      }
    }
    Some(s)
  }
}

/** EG-rewritings (Def. 17): unfolds the rule of a node through its
  * parents down to extensional atoms. Nodes are unfolded bottom-up, so
  * each node's rewriting is computed once and memoized by the caller
  * ([[TGDatalog]]); variables are freshened per use to keep rules
  * variable-disjoint as the definition assumes.
  *
  * Rewritings of deep non-linear nodes grow exponentially; above
  * `capAtoms` we return [[Rewriter.Oversized]] and the node is exempted
  * from containment-based minimization (an optimization is skipped,
  * soundness is unaffected — see DESIGN.md).
  */
object Rewriter {

  sealed trait Rewriting
  final case class Ok(cq: CQ) extends Rewriting
  /** MGU failure on some edge: the node's instance is provably empty. */
  case object EmptyRewriting extends Rewriting
  case object Oversized extends Rewriting

  /** Computes rew(v) given resolver `childRew` for parent rewritings. */
  def rewrite(node: TGNode, childRew: Int => Rewriting, capAtoms: Int,
              fresh: () => String): Rewriting = {
    val r = renameRule(node.rule, fresh)
    var head = r.head
    var out = Vector.empty[Atom]
    var rest: List[(Atom, Option[Int])] = r.body.zip(node.parents).toList
    while (rest.nonEmpty) {
      val (atom, parent) = rest.head
      rest = rest.tail
      parent match {
        case None => out :+= atom
        case Some(u) =>
          childRew(u) match {
            case EmptyRewriting => return EmptyRewriting
            case Oversized      => return Oversized
            case Ok(c0)         =>
              val c = renameCQ(c0, fresh)
              Unify.mgu(c.head, atom) match {
                case None        => return EmptyRewriting
                case Some(theta) =>
                  head = Unify(theta, head)
                  out = out.map(Unify(theta, _)) ++ c.body.map(Unify(theta, _))
                  rest = rest.map { case (a, p) => (Unify(theta, a), p) }
              }
          }
      }
      if (out.size > capAtoms) return Oversized
    }
    Ok(CQ(head, out))
  }

  private def renameRule(r: Rule, fresh: () => String): Rule = {
    val m = (r.bodyVars ++ r.head.varSet).map(v => v -> Var(fresh())).toMap
    def ren(a: Atom) = a.copy(terms = a.terms.map {
      case v: Var => m(v); case c => c
    })
    r.copy(body = r.body.map(ren), head = ren(r.head))
  }

  private def renameCQ(c: CQ, fresh: () => String): CQ = {
    val vars = (c.head.varSet ++ c.body.flatMap(_.varSet)).toSeq
    val m: Map[Var, Term] = vars.map(v => v -> Var(fresh())).toMap
    CQ(Unify(m, c.head), c.body.map(Unify(m, _)))
  }
}

/** CQ containment via the Chandra–Merlin homomorphism criterion:
  * Q1 ⊆ Q2 iff there is a homomorphism from Q2 into the frozen body of
  * Q1 mapping head to head. Drives `minDatalog` (Def. 19).
  */
object Containment {

  /** Freezes a CQ's variables into fresh nulls (canonical database). */
  private def freezeCQ(q: CQ): (Map[Var, Long], Hom.Instance) = {
    val vars = (q.head.varSet ++ q.body.flatMap(_.varSet)).toSeq
    val frozen = vars.zipWithIndex.map { case (v, i) => v -> (-(i + 1L)) }.toMap
    def ground(a: Atom): Fact = Fact(a.pred, a.terms.map {
      case v: Var => frozen(v); case Cst(c) => c
    })
    (frozen, Hom.toInstance(q.body.map(ground)))
  }

  /** Q1 ⊆ Q2 ? Both heads must have the same predicate/arity. */
  def contained(q1: CQ, q2: CQ): Boolean = {
    if (q1.head.pred != q2.head.pred || q1.head.arity != q2.head.arity) return false
    val (frozen, canonical) = freezeCQ(q1)
    // head correspondence: q2's head term i must map to q1's frozen head term i
    var fixed = Map.empty[Var, Long]
    for (((t2, t1), _) <- q2.head.terms.zip(q1.head.terms).zipWithIndex) {
      val target: Long = t1 match {
        case v: Var => frozen(v)
        case Cst(c) => c
      }
      t2 match {
        case v: Var =>
          fixed.get(v) match {
            case Some(x) if x != target => return false
            case _                      => fixed = fixed.updated(v, target)
          }
        case Cst(c) => if (c != target) return false
      }
    }
    Hom.findHom(q2.body, canonical, fixed).isDefined
  }
}

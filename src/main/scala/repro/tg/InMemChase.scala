package repro.tg

import repro.core._

/** Driver-side chase machinery behind `tglinear` (Alg. 1).
  *
  * Both pieces operate on single pattern facts from H(P) and tiny
  * instances, so everything is in-memory — the Spark substrate only runs
  * the *resulting* TG over real data ([[TGReasoner]]).
  */
object InMemChase {

  /** One chase-graph edge f_parent ->_rule f_derived (§3, chaseGraph). */
  final case class Event(rule: Rule, parent: Fact, derived: Fact)

  /** Breadth-first restricted chase of a linear program over the single
    * fact `f`, returning the chase-graph edges in derivation order. The
    * satisfaction check runs against the previous round's snapshot (as in
    * the paper's round-based chase, so the Example-1 graph G₁ comes out
    * exactly), while exact duplicates within a round keep only their first
    * producing event — one producer per fact suffices for TG wiring by
    * genericity of the pattern facts (§5).
    */
  def linearTracked(p: Program, f: Fact, maxRounds: Int = 200): Vector[Event] = {
    require(p.isLinear, "linearTracked requires a linear program")
    var inst: Hom.Instance = Hom.toInstance(Seq(f))
    val events = scala.collection.mutable.ArrayBuffer.empty[Event]
    val fired = scala.collection.mutable.Set.empty[(Int, Fact)]
    var fresh = -1L
    var changed = true
    var round = 0
    while (changed) {
      round += 1
      require(round <= maxRounds, s"single-fact chase of $f exceeded $maxRounds rounds")
      changed = false
      val snapshot = inst
      for (r <- p.rules) {
        for (h <- Hom.allHoms(r.body, snapshot).toVector) {
          val parent = groundAtom(r.body.head, h)
          if (!fired((r.id, parent))) {
            fired += ((r.id, parent))
            val sat = Hom.findHom(Seq(r.head), snapshot,
              r.frontier.map(v => v -> h(v)).toMap).isDefined
            if (!sat) {
              val ext = r.existentials.map { v => fresh -= 1; v -> (fresh + 1) }.toMap
              val derived = groundAtom(r.head, h ++ ext)
              if (!Hom.contains(inst, derived)) {
                inst = inst.updated(derived.pred,
                  inst.getOrElse(derived.pred, Set.empty) + derived.args)
                events += Event(r, parent, derived)
                changed = true
              }
            }
          }
        }
      }
    }
    events.toVector
  }

  private def groundAtom(a: Atom, sub: Map[Var, Long]): Fact =
    Fact(a.pred, a.terms.map {
      case Cst(v) => v
      case v: Var => sub.getOrElse(v, sys.error(s"unbound $v"))
    })

  /** In-memory TG-guided reasoning (Def. 5) over a tiny base instance —
    * used to evaluate node instances u({f}) for the domination checks of
    * `minLinear` and in unit tests. Returns the instance of every node.
    */
  def evalGraph(g: ExecGraph, base: Hom.Instance): Map[Int, Set[Fact]] = {
    val out = scala.collection.mutable.Map.empty[Int, Set[Fact]]
    var fresh = -1000L
    for (node <- g.topological) {
      val r = node.rule
      // Instance visible to each body position (Def. 5): parent's facts,
      // or the base instance for extensional positions.
      val perPos: Vector[Hom.Instance] = node.parents.zipWithIndex.map {
        case (None, _)    => base
        case (Some(u), _) => Hom.toInstance(out.getOrElse(u, Set.empty))
      }
      // Homomorphisms must respect positions: match atoms one at a time in
      // order, threading the substitution.
      def search(i: Int, sub: Map[Var, Long]): Iterator[Map[Var, Long]] =
        if (i == r.body.size) Iterator.single(sub)
        else Hom.allHoms(Seq(r.body(i)), perPos(i), sub).flatMap(search(i + 1, _))
      val facts = search(0, Map.empty).map { h =>
        val ext = r.existentials.map { v => fresh -= 1; v -> (fresh + 1) }.toMap
        groundAtom(r.head, h ++ ext)
      }.toSet
      // Dedup up-to-null-renaming inside a node so repeated homs of the
      // same binding don't inflate instances (they would in Def. 5 only
      // because our enumeration may revisit bindings).
      out(node.id) = facts
    }
    out.toMap
  }
}

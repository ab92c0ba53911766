package repro.core

/** Independent in-memory chase used as a correctness oracle (§3 "chase").
  *
  * This is deliberately the dumbest possible implementation: naive rounds,
  * full re-evaluation, explicit sets. The Spark engines and both TG
  * pipelines must agree with it (up to null renaming) on every test
  * instance — agreement of two unrelated implementations is the repo's
  * strongest correctness signal besides the DuckDB oracle.
  */
object RefEvaluator {

  /** Null policy of the chase variant (§3). */
  sealed trait NullPolicy
  /** Skolem chase (RDFox/COM): nulls are functional in (rule, binding). */
  case object Skolem extends NullPolicy
  /** Restricted chase (VLog): block triggers whose head is satisfied. */
  case object Restricted extends NullPolicy

  final case class Result(instance: Hom.Instance, rounds: Int, triggers: Long) {
    def idbFacts(p: Program): Long =
      instance.iterator.collect { case (q, ts) if p.idbPreds(q) => ts.size.toLong }.sum
  }

  /** Deterministic Skolem null for (rule, existential index, frontier). */
  def skolemNull(ruleId: Int, varIdx: Int, frontier: Seq[Long]): Long = {
    val h = scala.util.hashing.MurmurHash3.orderedHash(
      Iterator(ruleId.toLong, varIdx.toLong) ++ frontier.iterator, 0x5eed)
    -((h.toLong & 0x7fffffffL) + 1L)
  }

  /** Runs the chase to fixpoint. `maxRounds` guards non-terminating
    * Skolem chases on cyclic existential programs.
    */
  def chase(p: Program, base: Hom.Instance, policy: NullPolicy = Restricted,
            maxRounds: Int = 500): Result = {
    var inst = base
    var round = 0
    var triggers = 0L
    var freshNull = -1000000001L // restricted-chase fresh nulls, distinct range
    var changed = true
    while (changed) {
      changed = false
      round += 1
      require(round <= maxRounds, s"chase did not terminate in $maxRounds rounds")
      val snapshot = inst
      for (r <- p.rules) {
        val homs = Hom.allHoms(r.body, snapshot).toVector
        triggers += homs.size
        for (h <- homs) {
          val frontierVals = r.frontier.map(h)
          val derived: Option[Fact] = policy match {
            case Skolem =>
              val ext = r.existentials.zipWithIndex.map { case (v, i) =>
                v -> skolemNull(r.id, i, frontierVals)
              }.toMap
              val f = ground(r.head, h ++ ext)
              if (Hom.contains(inst, f)) None else Some(f)
            case Restricted =>
              // head satisfied iff h extends to a homomorphism of head into inst
              val sat = Hom.findHom(Seq(r.head), inst,
                r.frontier.map(v => v -> h(v)).toMap).isDefined
              if (sat) None
              else {
                val ext = r.existentials.map { v => freshNull -= 1; v -> (freshNull + 1) }.toMap
                Some(ground(r.head, h ++ ext))
              }
          }
          derived.foreach { f =>
            inst = inst.updated(f.pred, inst.getOrElse(f.pred, Set.empty) + f.args)
            changed = true
          }
        }
      }
    }
    Result(inst, round - 1, triggers)
  }

  private def ground(a: Atom, sub: Map[Var, Long]): Fact =
    Fact(a.pred, a.terms.map {
      case Cst(v) => v
      case v: Var => sub.getOrElse(v, sys.error(s"unbound $v in $a"))
    })
}

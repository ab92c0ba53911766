package repro.tg

import repro.core._

/** Instance-independent TGs for linear programs: `tglinear` (Alg. 1),
  * H(P) (§5), and `minLinear` (Def. 14) via preserving homomorphisms
  * (Def. 12) checked over H(P) only (Lemma 13).
  */
object TGLinear {

  /** H(P): one fact per pattern-isomorphism class of each extensional
    * predicate — i.e. one fact per set partition of the argument
    * positions (positions in the same block share a constant). Constants
    * are arbitrary representatives; genericity is what matters.
    */
  def patternFacts(p: Program): Vector[Fact] = {
    var nextConst = 1L
    p.edbPreds.toVector.sorted.flatMap { pred =>
      val n = p.arities(pred)
      setPartitions(n).map { blocks =>
        val assign = new Array[Long](n)
        for (block <- blocks) {
          val c = nextConst; nextConst += 1
          block.foreach(i => assign(i) = c)
        }
        Fact(pred, assign.toVector)
      }
    }
  }

  /** All set partitions of {0..n-1} (Bell(n); n is a predicate arity). */
  def setPartitions(n: Int): Vector[Vector[Vector[Int]]] = {
    require(n >= 0 && n <= 6, s"arity $n too large for pattern enumeration")
    if (n == 0) Vector(Vector.empty)
    else (0 until n).foldLeft(Vector(Vector.empty[Vector[Int]])) { (acc, i) =>
      acc.flatMap { part =>
        val grown = part.indices.map(b => part.updated(b, part(b) :+ i))
        grown :+ (part :+ Vector(i))
      }
    }
  }

  /** Algorithm 1: chases each pattern fact, turns chase-graph edges into
    * nodes, and wires node u below node v when v produced u's parent fact.
    * The per-fact subgraphs are disjointly unioned (line 10).
    */
  def tglinear(p: Program): ExecGraph = {
    require(p.isLinear, "tglinear requires a linear program")
    var nextId = 0
    val nodes = scala.collection.mutable.ArrayBuffer.empty[TGNode]
    for (f <- patternFacts(p)) {
      val events = InMemChase.linearTracked(p, f)
      // producer of each derived fact within this Γ (unique, cf. InMemChase)
      val producer = scala.collection.mutable.Map.empty[Fact, Int]
      for (e <- events) {
        val parentNode: Option[Int] =
          if (e.parent == f) None else Some(producer(e.parent))
        val id = nextId; nextId += 1
        nodes += TGNode(id, e.rule, Vector(parentNode))
        producer(e.derived) = id
      }
    }
    ExecGraph(p, nodes.toVector)
  }

  /** minLinear (Def. 14): exhaustively removes nodes dominated via
    * preserving homomorphisms (checked on every pattern fact, Lemma 13),
    * rewiring the removed node's children to the dominating node.
    *
    * Works in batch passes: one pass computes every node's per-pattern
    * instance once, scans nodes in id order, and folds each dominated
    * node into the first surviving dominator. Passes repeat until no node
    * is removed (a dominating node's facts are a hom-superset, so earlier
    * removals stay valid after rewiring).
    */
  def minLinear(g0: ExecGraph): ExecGraph = {
    val patterns = patternFacts(g0.program)
    var g = g0
    var changed = true
    while (changed) {
      changed = false
      val insts: Map[Fact, Map[Int, Set[Fact]]] =
        patterns.map(f => f -> InMemChase.evalGraph(g, Hom.toInstance(Seq(f)))).toMap
      val ids = g.nodes.map(_.id)
      val fold = scala.collection.mutable.Map.empty[Int, Int] // removed -> survivor
      for (u <- ids) {
        val dom = ids.find(v =>
          v != u && !fold.contains(v) && !fold.contains(u) &&
          // v must not descend from u — rewiring u's children to such a v
          // would create a cycle and EGs are acyclic by definition.
          !g.ancestorsOf(v).contains(u) && dominates(g, insts, patterns, u, v))
        dom.foreach { v => fold(u) = v; changed = true }
      }
      if (changed) {
        def applyFold(f: collection.Map[Int, Int]): ExecGraph = {
          def rt(x: Int): Int = f.get(x).map(rt).getOrElse(x)
          ExecGraph(g.program,
            g.nodes.filter(n => !f.contains(n.id)).map { n =>
              n.copy(parents = n.parents.map(_.map(rt)))
            })
        }
        val batched = applyFold(fold)
        // batch rewiring can interleave two folds into a cycle in corner
        // cases; fall back to applying the first fold alone (the outer
        // loop will pick up the rest on later passes).
        g = if (batched.isAcyclic) batched
            else applyFold(Map(fold.head))
      }
    }
    g
  }

  /** Is u dominated by v: a preserving homomorphism u({f}) -> v({f}) for
    * every pattern fact f, pinning nulls that occur in u's ancestors.
    */
  private def dominates(g: ExecGraph, insts: Map[Fact, Map[Int, Set[Fact]]],
                        patterns: Vector[Fact], u: Int, v: Int): Boolean =
    patterns.forall { f =>
      val iu = insts(f).getOrElse(u, Set.empty)
      val iv = insts(f).getOrElse(v, Set.empty)
      if (iu.isEmpty) true
      else {
        val ancestorNulls = g.ancestorsOf(u)
          .flatMap(a => insts(f).getOrElse(a, Set.empty))
          .flatMap(_.args.filter(_ < 0))
        Hom.findHom(Hom.freeze(iu, pinned = ancestorNulls),
                    Hom.toInstance(iv)).isDefined
      }
    }
}

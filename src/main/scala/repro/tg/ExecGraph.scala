package repro.tg

import repro.core.{Program, Rule}

/** A node of an execution graph (Def. 4): a rule occurrence whose body
  * positions are wired to parent nodes. `parents(i) == None` means body
  * position i is extensional and binds to the base instance directly
  * (the paper w.l.o.g. splits bodies into all-EDB/all-IDB; we support
  * mixed bodies by letting EDB positions read B).
  */
final case class TGNode(id: Int, rule: Rule, parents: Vector[Option[Int]]) {
  require(parents.size == rule.body.size, s"parents/body mismatch for node $id")
}

/** An execution graph (Def. 4): acyclic, node-labelled with rules,
  * edge-labelled with body positions. Whether it is a *trigger* graph
  * (Def. 6) is a semantic property established by the construction
  * algorithms (`tglinear`, `TGmat`) and checked in tests against the
  * chase.
  */
final case class ExecGraph(program: Program, nodes: Vector[TGNode]) {

  lazy val byId: Map[Int, TGNode] = nodes.map(n => n.id -> n).toMap

  /** Edges (from, to, bodyPosition). */
  lazy val edges: Vector[(Int, Int, Int)] =
    nodes.flatMap(n => n.parents.zipWithIndex.collect {
      case (Some(u), j) => (u, n.id, j)
    })

  /** Longest-path depth per node (extensional nodes have depth 0). */
  lazy val depthOf: Map[Int, Int] = {
    val memo = scala.collection.mutable.Map.empty[Int, Int]
    def d(id: Int): Int = memo.getOrElseUpdate(id, {
      val ps = byId(id).parents.flatten
      if (ps.isEmpty) 0 else ps.map(d).max + 1
    })
    nodes.foreach(n => d(n.id))
    memo.toMap
  }

  /** Kahn's algorithm — used to validate rewiring in `minLinear`. */
  def isAcyclic: Boolean = {
    val indeg = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
    val out = scala.collection.mutable.Map.empty[Int, List[Int]].withDefaultValue(Nil)
    for ((u, v, _) <- edges) { indeg(v) += 1; out(u) = v :: out(u) }
    val queue = scala.collection.mutable.Queue(nodes.map(_.id).filter(indeg(_) == 0): _*)
    var seen = 0
    while (queue.nonEmpty) {
      val u = queue.dequeue(); seen += 1
      for (v <- out(u)) { indeg(v) -= 1; if (indeg(v) == 0) queue.enqueue(v) }
    }
    seen == nodes.size
  }

  def numNodes: Int = nodes.size
  def numEdges: Int = edges.size
  def depth: Int = if (nodes.isEmpty) 0 else depthOf.values.max

  /** Nodes in parent-before-child order. */
  def topological: Vector[TGNode] = nodes.sortBy(n => (depthOf(n.id), n.id))

  def childrenOf(id: Int): Vector[TGNode] =
    nodes.filter(_.parents.contains(Some(id)))

  /** Transitive ancestors of a node (used by preserving homomorphisms). */
  def ancestorsOf(id: Int): Set[Int] = {
    val out = scala.collection.mutable.Set.empty[Int]
    def walk(i: Int): Unit =
      byId(i).parents.flatten.foreach { p => if (out.add(p)) walk(p) }
    walk(id)
    out.toSet
  }
}

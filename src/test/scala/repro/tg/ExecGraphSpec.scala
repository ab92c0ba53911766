package repro.tg

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit

class ExecGraphSpec extends AnyFunSuite {

  private val (p, _) = TestKit.program(
    "B(X) :- a(X)\nC(X) :- B(X)\nD(X) :- B(X), C(X)")
  private val n0 = TGNode(0, p.rules(0), Vector(None))
  private val n1 = TGNode(1, p.rules(1), Vector(Some(0)))
  private val n2 = TGNode(2, p.rules(2), Vector(Some(0), Some(1)))
  private val g = ExecGraph(p, Vector(n0, n1, n2))

  test("edges carry body positions") {
    assert(g.edges.toSet == Set((0, 1, 0), (0, 2, 0), (1, 2, 1)))
    assert(g.numEdges == 3)
  }

  test("depth is the longest path") {
    assert(g.depthOf == Map(0 -> 0, 1 -> 1, 2 -> 2))
    assert(g.depth == 2)
  }

  test("topological order puts parents first") {
    val order = g.topological.map(_.id)
    assert(order.indexOf(0) < order.indexOf(1))
    assert(order.indexOf(1) < order.indexOf(2))
  }

  test("ancestors are transitive") {
    assert(g.ancestorsOf(2) == Set(0, 1))
    assert(g.ancestorsOf(1) == Set(0))
    assert(g.ancestorsOf(0) == Set.empty[Int])
  }

  test("childrenOf lists direct children") {
    assert(g.childrenOf(0).map(_.id).toSet == Set(1, 2))
    assert(g.childrenOf(2).isEmpty)
  }

  test("empty graph has depth 0") {
    assert(ExecGraph(p, Vector.empty).depth == 0)
  }

  test("node parents must align with the rule body") {
    intercept[IllegalArgumentException](TGNode(9, p.rules(2), Vector(Some(0))))
  }
}

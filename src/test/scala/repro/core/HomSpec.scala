package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit

class HomSpec extends AnyFunSuite {
  private val d = new TermDict
  private def inst(text: String) = TestKit.instance(text, d)

  test("single-atom homomorphism binds variables") {
    val i = inst("e(1,2)")
    val h = Hom.findHom(Seq(Atom("e", Vector(Var("X"), Var("Y")))), i)
    assert(h.contains(Map(Var("X") -> 1L, Var("Y") -> 2L)))
  }

  test("constants in atoms must match exactly") {
    val i = inst("e(1,2)")
    assert(Hom.findHom(Seq(Atom("e", Vector(Cst(1), Var("Y")))), i).isDefined)
    assert(Hom.findHom(Seq(Atom("e", Vector(Cst(3), Var("Y")))), i).isEmpty)
  }

  test("repeated variables require equal values") {
    val i = inst("e(1,2)\ne(3,3)")
    val homs = Hom.allHoms(Seq(Atom("e", Vector(Var("X"), Var("X")))), i).toList
    assert(homs == List(Map(Var("X") -> 3L)))
  }

  test("joins across atoms thread the substitution") {
    val i = inst("e(1,2)\ne(2,3)\ne(5,6)")
    val body = Seq(Atom("e", Vector(Var("X"), Var("Y"))),
                   Atom("e", Vector(Var("Y"), Var("Z"))))
    val homs = Hom.allHoms(body, i).toList
    assert(homs.size == 1)
    assert(homs.head == Map(Var("X") -> 1L, Var("Y") -> 2L, Var("Z") -> 3L))
  }

  test("fixed bindings constrain the search") {
    val i = inst("e(1,2)\ne(2,3)")
    val h = Hom.findHom(Seq(Atom("e", Vector(Var("X"), Var("Y")))), i,
      Map(Var("X") -> 2L))
    assert(h.contains(Map(Var("X") -> 2L, Var("Y") -> 3L)))
  }

  test("allHoms enumerates every match") {
    val i = inst("e(1,2)\ne(2,3)\ne(3,4)")
    assert(Hom.allHoms(Seq(Atom("e", Vector(Var("X"), Var("Y")))), i).size == 3)
  }

  test("cross-product homs when no shared variables") {
    val i = inst("a(1)\na(2)\nb(7)")
    val body = Seq(Atom("a", Vector(Var("X"))), Atom("b", Vector(Var("Y"))))
    assert(Hom.allHoms(body, i).size == 2)
  }

  test("freeze turns nulls into variables unless pinned") {
    val fs = Seq(Fact("p", Vector(-1L, 5L)))
    val free = Hom.freeze(fs)
    assert(free.head.terms(0).isInstanceOf[Var])
    val pinned = Hom.freeze(fs, pinned = Set(-1L))
    assert(pinned.head.terms(0) == Cst(-1L))
  }

  test("entails: null-free subset iff entailment") {
    val a = inst("e(1,2)")
    val ab = inst("e(1,2)\ne(2,3)")
    assert(Hom.entails(ab, a))
    assert(!Hom.entails(a, ab))
  }

  test("entails maps nulls to anything consistently") {
    val withNull = Hom.toInstance(Seq(Fact("p", Vector(-1L, -1L))))
    val ground = Hom.toInstance(Seq(Fact("p", Vector(7L, 7L))))
    val groundDiff = Hom.toInstance(Seq(Fact("p", Vector(7L, 8L))))
    assert(Hom.entails(ground, withNull))
    assert(!Hom.entails(groundDiff, withNull)) // -1 cannot map to both 7 and 8
    assert(!Hom.entails(withNull, ground))     // constants are rigid
  }

  test("equivalent is hom in both directions") {
    val a = Hom.toInstance(Seq(Fact("p", Vector(1L, -1L))))
    val b = Hom.toInstance(Seq(Fact("p", Vector(1L, -9L))))
    assert(Hom.equivalent(a, b))
    assert(!Hom.equivalent(a, Hom.toInstance(Seq(Fact("p", Vector(1L, 2L))))))
  }

  test("instance helpers: union, size, contains, factsOf") {
    val a = inst("a(1)")
    val b = inst("b(2)\na(1)")
    val u = Hom.union(a, b)
    assert(Hom.size(u) == 2)
    assert(Hom.contains(u, Fact("a", Vector(1L))))
    assert(!Hom.contains(u, Fact("a", Vector(9L))))
    assert(Hom.factsOf(u).size == 2)
  }
}

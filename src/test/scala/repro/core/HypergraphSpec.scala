package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Fixtures._

/** GYO reduction and hypergraph structure (paper §2.2). */
class HypergraphSpec extends AnyFunSuite {

  test("paper Q1 (TPC-H Q9 shape) is acyclic") {
    assert(Hypergraph.isAcyclic(q1))
  }

  test("triangle is cyclic") {
    assert(!Hypergraph.isAcyclic(triangle))
  }

  test("dumbbell (Example 4.1) is cyclic") {
    assert(!Hypergraph.isAcyclic(dumbbell))
  }

  test("line queries of any length are acyclic") {
    (2 to 6).foreach { k =>
      assert(Hypergraph.isAcyclic(line(k, Vector("x1"))), s"line-$k")
    }
  }

  test("single atom is acyclic") {
    assert(Hypergraph.isAcyclic(Vector(Atom("r", Vector("a", "b")))))
  }

  test("two disjoint atoms (Cartesian product) are acyclic") {
    assert(Hypergraph.isAcyclic(Vector(
      Atom("r", Vector("a")), Atom("s", Vector("b")))))
  }

  test("atom contained in another is an ear") {
    val (steps, rest) = Hypergraph.gyo(Vector(
      Atom("big", Vector("a", "b", "c")), Atom("small", Vector("a", "b"))))
    assert(rest.size == 1)
    assert(steps.head.ear == "small" || steps.head.ear == "big")
  }

  test("appendix counterexample: acyclic query with a cyclic sub-hypergraph") {
    // R1(x1,x2,x3) ⋈ R2(x1,x2) ⋈ R3(x2,x3) ⋈ R4(x1,x3) is acyclic while
    // {R2, R3, R4} alone is the triangle (paper, proof of Lemma 2.2).
    val atoms = Vector(
      Atom("R1", Vector("x1", "x2", "x3")), Atom("R2", Vector("x1", "x2")),
      Atom("R3", Vector("x2", "x3")), Atom("R4", Vector("x1", "x3")))
    assert(Hypergraph.isAcyclic(atoms))
    assert(!Hypergraph.isAcyclic(atoms.tail))
  }

  test("TPC-H Q5 shape is cyclic (Example 5.2)") {
    val atoms = Vector(
      Atom("c", Vector("ck", "nk")), Atom("o", Vector("ok", "ck")),
      Atom("l", Vector("ok", "sk")), Atom("s", Vector("sk", "nk")),
      Atom("n", Vector("nk")))
    assert(!Hypergraph.isAcyclic(atoms))
  }

  test("5-cycle is cyclic") {
    val atoms = (1 to 5).map(i =>
      Atom(s"e$i", Vector(s"x$i", s"x${i % 5 + 1}"))).toVector
    assert(!Hypergraph.isAcyclic(atoms))
  }

  test("intersection edges of a line query form a path") {
    val cq = line(4, Vector("x1"))
    assert(Hypergraph.intersectionEdges(cq.atoms) ==
      Vector((0, 1), (1, 2), (2, 3)))
  }

  test("components: connected line is one component") {
    assert(Hypergraph.components(line(3, Vector("x1")).atoms).size == 1)
  }

  test("components: disjoint atoms are separate components") {
    val atoms = Vector(Atom("r", Vector("a")), Atom("s", Vector("b")),
      Atom("t", Vector("b", "c")))
    assert(Hypergraph.components(atoms).toSet == Set(Set(0), Set(1, 2)))
  }

  test("gyo removal sequence covers all but one atom for acyclic queries") {
    val (steps, rest) = Hypergraph.gyo(q1.atoms)
    assert(steps.size == 5 && rest.size == 1)
  }
}

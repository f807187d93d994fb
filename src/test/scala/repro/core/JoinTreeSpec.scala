package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Fixtures._

/** Join-tree enumeration and the free-connex / relation-dominated query
  * classes (paper §2.2, Lemma 2.2, Examples 2.3).
  */
class JoinTreeSpec extends AnyFunSuite {

  test("T1 and T2 are valid join trees for Q1") {
    assert(JoinTree.isValid(q1, q1TreeT1.edges))
    assert(JoinTree.isValid(q1, q1TreeT2.edges))
  }

  test("an invalid tree violating running intersection is rejected") {
    // Attach R6(x7,x8) to R1 (no shared attribute with R1; x7 lives in R5).
    val bad = RootedTree("R1", Vector(
      RootedTree("R2", Vector.empty), RootedTree("R3", Vector.empty),
      RootedTree("R4", Vector.empty), RootedTree("R5", Vector.empty),
      RootedTree("R6", Vector.empty)))
    assert(!JoinTree.isValid(q1, bad.edges))
  }

  test("enumerateUnrooted finds both paper trees for Q1") {
    val trees = JoinTree.enumerateUnrooted(q1)
    assert(trees.contains(q1TreeT1.edges))
    assert(trees.contains(q1TreeT2.edges))
  }

  test("all enumerated trees are valid") {
    for (cq <- Seq(q1, q2, q3, q4, line(5, Vector("x1")));
         t <- JoinTree.enumerateUnrooted(cq))
      assert(JoinTree.isValid(cq, t))
  }

  test("maxWeightTree yields a valid join tree for acyclic queries") {
    for (cq <- Seq(q1, q4, line(3, Vector("x1")), line(5, Vector("x6"))))
      assert(JoinTree.isValid(cq, JoinTree.maxWeightTree(cq).get), cq.name)
  }

  test("defaultTree roots at an output-covering atom") {
    assert(JoinTree.defaultTree(q3).atomId == "R1") // Q3 is dominated by R1
  }

  test("Q1 is not free-connex (Example 2.3)") {
    assert(!JoinTree.isFreeConnexQuery(q1))
  }

  test("Q2 is free-connex with T2 but not with T1 (Example 2.3)") {
    assert(JoinTree.isFreeConnexQuery(q2))
    assert(JoinTree.isFreeConnex(q2, q1TreeT2))
    assert(!JoinTree.isFreeConnex(q2, q1TreeT1))
  }

  test("Q2's connex subset under T2 is {R1, R2, R4} and still covers O") {
    // R3 and R5 join R1 on x4 ∉ O, so they (and R6) stay outside T_n;
    // the remaining attributes x1..x6 still cover the output.
    val tn = JoinTree.connexSubset(q2, q1TreeT2)
    assert(tn == Set("R1", "R2", "R4"))
    assert(q2.outputSet.subsetOf(tn.flatMap(id => q2.atom(id).attrSet)))
  }

  test("Q3 is relation-dominated by R1 (Example 2.3)") {
    assert(JoinTree.dominatingAtom(q3).map(_.id).contains("R1"))
    assert(JoinTree.isRelationDominated(q3))
  }

  test("relation-dominated implies free-connex") {
    assert(JoinTree.isFreeConnexQuery(q3))
    assert(JoinTree.isFreeConnexQuery(q4)) // Q4 dominated by R1
  }

  test("full queries are free-connex under every rooted tree") {
    val full = line(3, (1 to 4).map(i => s"x$i").toVector,
      Vector.empty, distinct = false)
    JoinTree.enumerateRooted(full).foreach { t =>
      assert(JoinTree.isFreeConnex(full, t), t.render())
    }
  }

  test("empty-output queries are free-connex") {
    assert(JoinTree.isFreeConnexQuery(line(4, Vector.empty, count())))
  }

  test("line-3 endpoints projection is NOT free-connex (SGPB q6)") {
    assert(!JoinTree.isFreeConnexQuery(line(3, Vector("x1", "x4"))))
  }

  test("line-4 endpoint-pair aggregations are NOT free-connex (SGPB q7-q9)") {
    assert(!JoinTree.isFreeConnexQuery(line(4, Vector("x1", "x5"), count())))
    assert(!JoinTree.isFreeConnexQuery(line(4, Vector("x2", "x5"), count())))
    assert(!JoinTree.isFreeConnexQuery(line(4, Vector("x1", "x4"), count())))
  }

  test("line-3 prefix projections ARE free-connex (SGPB q1c/q3c)") {
    assert(JoinTree.isFreeConnexQuery(line(3, Vector("x2", "x3"))))
    assert(JoinTree.isFreeConnexQuery(line(3, Vector("x1", "x2"))))
  }

  test("rooted enumeration roots every tree at every atom") {
    val unrooted = JoinTree.enumerateUnrooted(q4)
    val rooted = JoinTree.enumerateRooted(q4)
    assert(rooted.size == unrooted.size * q4.atoms.size)
  }

  test("postOrder visits children before parents, root last") {
    val po = q1TreeT1.postOrder
    assert(po.last == "R5")
    assert(po.indexOf("R4") < po.indexOf("R3"))
    assert(po.indexOf("R3") < po.indexOf("R1"))
    assert(po.indexOf("R2") < po.indexOf("R1"))
  }

  test("parents map inverts the tree structure") {
    val p = q1TreeT1.parents
    assert(p("R1") == "R5" && p("R6") == "R5" && p("R4") == "R3")
    assert(!p.contains("R5"))
  }

  test("root() reconstructs a rooted tree from its edge set") {
    val rebuilt = JoinTree.root(q1TreeT1.edges, q1.atoms.map(_.id).toSet, "R5")
    assert(rebuilt.edges == q1TreeT1.edges)
    assert(rebuilt.atomId == "R5")
  }

  test("height and size") {
    assert(q1TreeT1.height == 3 && q1TreeT1.size == 6)
    assert(q1TreeT2.height == 2 && q1TreeT2.size == 6)
  }

  test("disconnected query still gets a (Cartesian-edged) join tree") {
    val cq = CQ("cart", Vector(Atom("r", Vector("a")), Atom("s", Vector("b"))),
      Vector("a", "b"))
    val trees = JoinTree.enumerateUnrooted(cq)
    assert(trees.nonEmpty)
    assert(trees.head.size == 1)
  }
}

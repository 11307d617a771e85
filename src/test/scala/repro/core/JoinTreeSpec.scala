package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.Queries

/** §3.2 classification and §4.1/§6.3 plan construction. */
class JoinTreeSpec extends AnyFunSuite {

  // ------------------------------------------------------------ acyclicity

  test("GYO: paths and stars are acyclic, cycles are not") {
    assert(Hypergraph.isAcyclic(Queries.hop3Full(1000)))
    assert(Hypergraph.isAcyclic(Queries.hop4Full(1000)))
    assert(Hypergraph.isAcyclic(Queries.star3(1000)))
    assert(Hypergraph.isAcyclic(Queries.comb2(1000)))
    val triangle = CQ("tri", Vector(Atom("A", Vector("x", "y")),
      Atom("B", Vector("y", "z")), Atom("C", Vector("z", "x"))), Vector("x", "y", "z"))
    assert(!Hypergraph.isAcyclic(triangle))
    assert(!Hypergraph.isAcyclic(Queries.dumbbellFull(1000)))
  }

  test("free-connex classification matches §3.2's examples") {
    // Q1' = π_{x2} R1(x1,x2) ⋈ R2(x2,x3): free-connex
    assert(Hypergraph.isFreeConnex(Queries.fig2(Vector("x2"))))
    assert(Hypergraph.isFreeConnex(Queries.fig2(Vector("x1"))))
    // output {x1,x3}: acyclic but NOT free-connex
    assert(Hypergraph.isAcyclic(Queries.fig2(Vector("x1", "x3"))))
    assert(!Hypergraph.isFreeConnex(Queries.fig2(Vector("x1", "x3"))))
    // acyclic full joins are free-connex
    assert(Hypergraph.isFreeConnex(Queries.hop4Full(1000)))
    assert(Hypergraph.isFreeConnex(Queries.thm62))
    assert(Hypergraph.isFreeConnex(Queries.snbQ2(1000)))
    assert(Hypergraph.isFreeConnex(Queries.snbQ4Extended(1000)))
  }

  test("q-hierarchical classification (Def 3.3)") {
    assert(Hypergraph.isQHierarchical(Queries.star3(1000)))
    assert(!Hypergraph.isQHierarchical(Queries.hop3Full(1000))) // x2/x3 atom sets overlap
    assert(!Hypergraph.isQHierarchical(Queries.thm62))
  }

  // ------------------------------------------------------- tree structure

  test("Fig 2: three (generalized) join trees for R1(x1,x2) ⋈ R2(x2,x3)") {
    val full = Queries.fig2(Vector("x1", "x2", "x3"))
    val cands = JoinTree.candidates(full)
    // T1 (root R1), T2 (root R2), T3 (gen root [x2])
    assert(cands.exists(t => t.atomName.contains("R1") && t.height == 2))
    assert(cands.exists(t => t.atomName.contains("R2") && t.height == 2))
    assert(cands.exists(t => t.isGen && t.attrs == Vector("x2") && t.height == 1))
    assert(cands.forall(t => JoinTree.isFreeConnexTree(full, t)))
  }

  test("Fig 2 with output {x1}: only the R1-rooted tree qualifies") {
    val cq = Queries.fig2(Vector("x1"))
    val ok = JoinTree.candidates(cq).filter(t => JoinTree.isFreeConnexTree(cq, t))
    assert(ok.nonEmpty)
    assert(ok.forall(_.atomName.contains("R1")))
  }

  test("Fig 2 with output {x1,x3}: no tree qualifies (needs §7.1 extension)") {
    val cq = Queries.fig2(Vector("x1", "x3"))
    assert(JoinTree.choose(cq).isEmpty)
  }

  test("Fig 1(c): the 4-hop intro query gets a height-2 generalized tree") {
    val t = JoinTree.choose(Queries.hop4Intro(1000)).get
    assert(t.height == 2, s"got $t")
    assert(t.isGen, s"root should be a generalized relation, got $t")
  }

  test("3-hop full join gets a height-2 tree; plain join trees have height >= 2") {
    val t = JoinTree.choose(Queries.hop3Full(1000)).get
    assert(t.height == 2)
  }

  test("Lemma 6.8: q-hierarchical queries get height-1 trees") {
    val star = JoinTree.hierarchicalTree(Queries.star3(1000))
    assert(star.isDefined && star.get.height == 1, s"got $star")
    assert(JoinTree.choose(Queries.star3(1000)).get.height == 1)
    // nested hierarchy: R1(x,y), R2(x,y), R3(x,z)
    val nested = CQ("nested", Vector(Atom("R1", Vector("x", "y")),
      Atom("R2", Vector("x", "y")), Atom("R3", Vector("x", "z"))),
      Vector("x", "y", "z"))
    assert(Hypergraph.isQHierarchical(nested))
    val t = JoinTree.hierarchicalTree(nested)
    assert(t.isDefined && t.get.height == 1, s"got $t")
  }

  test("SNB Q2/Q3/Q4 shapes admit enumerable trees") {
    assert(JoinTree.choose(Queries.snbQ2(1000)).isDefined)
    assert(JoinTree.choose(Queries.snbQ3(1000)).isDefined)
    assert(JoinTree.choose(Queries.snbQ4Extended(1000)).isDefined)
    assert(JoinTree.choose(Queries.snbQ1).get.height <= 2)
  }

  test("validate rejects generalized nodes below input relations") {
    val cq = Queries.fig2(Vector("x1", "x2", "x3"))
    val bad = JTNode(Vector("x1", "x2"), Some("R1"), Vector(
      JTNode(Vector("x2"), None, Vector(
        JTNode(Vector("x2", "x3"), Some("R2"), Vector.empty)))))
    assert(JoinTree.validate(cq, bad).isLeft)
  }

  test("validate rejects attribute-disconnected trees") {
    val cq = Queries.hop3Full(1000)
    // G1 under G3: x2 appears in G1 and G2 but not on the connecting path
    val bad = JTNode(Vector("x2", "x3"), Some("G2"), Vector(
      JTNode(Vector("x3", "x4"), Some("G3"), Vector(
        JTNode(Vector("x1", "x2"), Some("G1"), Vector.empty)))))
    assert(JoinTree.validate(cq, bad).isLeft)
  }

  test("plan cost Σ d(e)N(e) weights update-heavy relations by depth") {
    val cq = Queries.fig2(Vector("x1", "x2", "x3"))
    val r1Root = JoinTree.candidates(cq).find(_.atomName.contains("R1")).get
    // R2 sits at depth 1 under R1
    assert(JoinTree.cost(r1Root, Map("R1" -> 100L, "R2" -> 1L)) == 1L)
    assert(JoinTree.cost(r1Root, Map("R1" -> 1L, "R2" -> 100L)) == 100L)
    // the generalized-root tree has no relation below another: cost 0
    val gen = JoinTree.candidates(cq).find(_.isGen).get
    assert(JoinTree.cost(gen, Map("R1" -> 100L, "R2" -> 100L)) == 0L)
  }

  test("choose prefers lower height, then lower update-weighted cost") {
    val cq = Queries.fig2(Vector("x1", "x2", "x3"))
    assert(JoinTree.choose(cq).get.height == 1) // the [x2] tree
    val path = Queries.hop3Full(1000)
    val heavyG1 = JoinTree.choose(path, Map("G1" -> 1000L, "G2" -> 1L, "G3" -> 1L)).get
    val heavyG3 = JoinTree.choose(path, Map("G1" -> 1L, "G2" -> 1L, "G3" -> 1000L)).get
    assert(JoinTree.cost(heavyG1, Map("G1" -> 1000L, "G2" -> 1L, "G3" -> 1L)) <=
      JoinTree.cost(heavyG3, Map("G1" -> 1000L, "G2" -> 1L, "G3" -> 1L)))
  }

  test("height counts input relations only (generalized nodes are free)") {
    val cq = Queries.star3(1000)
    val t = JoinTree.hierarchicalTree(cq).get
    assert(t.isGen && t.height == 1 && t.allNodes.count(!_.isGen) == 3)
  }
}

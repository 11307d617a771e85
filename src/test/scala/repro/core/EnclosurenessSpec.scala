package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.stream.Updates
import repro.workload.Queries

/** §6: enclosureness of update sequences — lifespan extraction, Definition
  * 6.1 vs the join-tree-specific Definition 6.4, and the lemmas that make
  * λ_T = 1 for the easy classes.
  */
class EnclosurenessSpec extends AnyFunSuite {

  test("lifespans: insert/delete pairing, reinsertion, open intervals") {
    val us = Vector(
      Upd("R", Tup(1L), isInsert = true, ts = 1),
      Upd("R", Tup(1L), isInsert = false, ts = 3),
      Upd("R", Tup(1L), isInsert = true, ts = 5), // reinsertion = new lifespan
      Upd("R", Tup(2L), isInsert = true, ts = 2))
    val ls = Enclosureness.lifespans(us)
    assert(ls.size == 3)
    assert(ls.exists(l => l.plus == 1 && l.minus == 3))
    assert(ls.exists(l => l.plus == 5 && l.minus == Long.MaxValue))
    assert(ls.exists(l => l.plus == 2 && l.minus == Long.MaxValue))
  }

  test("Def 6.1: nested disjoint lifespans are counted") {
    // one long-lived tuple enclosing 3 disjoint churn lifespans
    val us = Vector(
      Upd("R", Tup(0L), isInsert = true, ts = 0)) ++
      (1 to 3).flatMap(i => Vector(
        Upd("R", Tup(i.toLong), isInsert = true, ts = 10L * i),
        Upd("R", Tup(i.toLong), isInsert = false, ts = 10L * i + 5))) ++
      Vector(Upd("R", Tup(0L), isInsert = false, ts = 100))
    // λ(long tuple) = 3, churn tuples 0 → avg = 3/4 → max(·,1) = 1;
    // with three long tuples the average rises above 1
    assert(Enclosureness.lambda(us) >= 1.0)
    val us3 = Vector(Upd("R", Tup(100L), true, 0), Upd("R", Tup(101L), true, 0),
      Upd("R", Tup(102L), true, 0)) ++
      (1 to 6).flatMap(i => Vector(
        Upd("R", Tup(i.toLong), true, 10L * i), Upd("R", Tup(i.toLong), false, 10L * i + 5))) ++
      Vector(Upd("R", Tup(100L), false, 100), Upd("R", Tup(101L), false, 100),
        Upd("R", Tup(102L), false, 100))
    assert(Enclosureness.lambda(us3) >= 1.9, s"got ${Enclosureness.lambda(us3)}")
  }

  test("Example 6.5 (qualitative): λ grows with tree T1 but stays 1 for the height-1 tree") {
    val cq = Queries.fig2(Vector("x1", "x2", "x3"))
    val n = 8
    // n long-lived R1 tuples (all sharing x2=0) + n sequential R2 churns
    val us = (1 to n).map(i => Upd("R1", Tup(i.toLong, 0L), true, 0L)).toVector ++
      (1 to n).flatMap(i => Vector(
        Upd("R2", Tup(0L, i.toLong), true, 10L * i),
        Upd("R2", Tup(0L, i.toLong), false, 10L * i + 5))) ++
      (1 to n).map(i => Upd("R1", Tup(i.toLong, 0L), false, 1000L))
    val t1 = JoinTree.candidates(cq).find(_.atomName.contains("R1")).get // R1(R2)
    val t3 = JoinTree.candidates(cq).find(_.isGen).get                   // [x2](R1,R2)
    val l1 = Enclosureness.lambdaTree(cq, t1, us)
    val l3 = Enclosureness.lambdaTree(cq, t3, us)
    assert(l1 >= n / 4.0, s"λ_T1 = $l1 should grow with n")
    assert(l3 == 1.0, s"λ_T3 = $l3 should be 1 for the height-1 tree")
  }

  test("Lemma 6.9: FIFO sequences have λ_T = 1 on height-2 trees") {
    val cq = Queries.hop3Full(1000)
    val tree = JoinTree.choose(cq).get
    assert(tree.height <= 2)
    val edges = (0 until 40).map(i => Tup((i % 7).toLong, ((i * 3) % 7).toLong)).distinct
    val base = Updates.fifoWindow("G", edges, w = 10)
    val perAtom = Updates.expandSelfJoin(base, Map("G" -> Seq("G1", "G2", "G3")))
    assert(Enclosureness.lambdaTree(cq, tree, perAtom) == 1.0)
  }

  test("Lemma 6.10: insertion-only sequences have λ_T = 1 on any tree") {
    val cq = Queries.hop3Full(1000)
    val edges = (0 until 60).map(i => Tup((i % 9).toLong, ((i * 5) % 9).toLong)).distinct
    val base = Updates.insertionOnly("G", edges)
    val perAtom = Updates.expandSelfJoin(base, Map("G" -> Seq("G1", "G2", "G3")))
    for (t <- JoinTree.candidates(cq).filter(t => JoinTree.isFreeConnexTree(cq, t)))
      assert(Enclosureness.lambdaTree(cq, t, perAtom) == 1.0, s"tree $t")
  }

  test("λ-targeted generator: measured λ_T scales with the knob") {
    val cq = Queries.hop3Full(1000)
    val tree = JoinTree.choose(cq).get
    def lam(k: Int): Double = {
      val base = Updates.lambdaSequence("G", hubs = k, churns = k)
      val perAtom = Updates.expandSelfJoin(base, Map("G" -> Seq("G1", "G2", "G3")))
      Enclosureness.lambdaTree(cq, tree, perAtom)
    }
    val l2 = lam(2); val l8 = lam(8); val l16 = lam(16)
    assert(l8 > l2, s"λ(8)=$l8 should exceed λ(2)=$l2")
    assert(l16 > l8, s"λ(16)=$l16 should exceed λ(8)=$l8")
    assert(l16 >= 2.2, s"λ(16)=$l16 too small")
  }

  test("Theorem 6.2 construction: the OuMv sequence has λ_T ≈ n") {
    val n = 10
    val rnd = new scala.util.Random(5)
    val m = Array.fill(n, n)(rnd.nextBoolean())
    val us = Array.fill(n, n)(rnd.nextBoolean())
    val vs = Array.fill(n, n)(rnd.nextBoolean())
    val (seq, _) = Updates.ouMvSequence(m, us, vs)
    val tree = JoinTree.choose(Queries.thm62).get
    val lam = Enclosureness.lambdaTree(Queries.thm62, tree, seq)
    assert(lam >= n / 4.0, s"λ_T = $lam, expected Ω(n) per Theorem 6.2")
  }
}

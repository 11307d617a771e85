package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.StandardIvm
import repro.ghd.BagEngine
import repro.stream.Updates
import repro.workload.Queries
import scala.util.Random

/** Quantitative claims of §4/§6/§7: linear space (Lemma 4.1), O(1) amortized
  * update cost where the theory promises it (Lemmas 6.8–6.10, Example 6.12),
  * and the O(N^1.5) dumbbell space bound (Lemma 7.2). Work is measured by
  * the engines' abstract counter, so the assertions are stable across
  * machines; bounds are generous to avoid flakiness.
  */
class UpdateCostSpec extends AnyFunSuite {

  private def randomEdges(n: Int, dom: Int, seed: Int): Vector[Tup.T] = {
    val rnd = new Random(seed)
    Iterator.continually(Tup(rnd.nextInt(dom).toLong, rnd.nextInt(dom).toLong))
      .distinct.take(n).toVector
  }

  test("Lemma 4.1: CROWN space stays linear in the input") {
    val cq = Queries.hop3Full(1000)
    val tree = JoinTree.choose(cq).get
    def spaceFor(m: Int): Long = {
      val eng = new CrownEngine(cq, tree)
      for (e <- randomEdges(m, 6 * m / 10, 1); a <- Seq("G1", "G2", "G3"))
        eng.processUpdate(Upd(a, e, isInsert = true))(_ => ())
      eng.spaceEntries
    }
    val s500 = spaceFor(500)
    val s1000 = spaceFor(1000)
    assert(s1000 <= 60L * 3 * 1000, s"space $s1000 not linear-ish")
    assert(s1000.toDouble / s500 < 3.0, s"space grew superlinearly: $s500 -> $s1000")
  }

  test("Example 6.12: CROWN O(1) vs standard CP's polynomial update cost") {
    // distinct relations R1..R4 (no self-join), hop4-intro output
    def load(n: Int): (Double, Double) = {
      val cq = Queries.hop4Intro(1000)
      val crown = new CrownEngine(cq, JoinTree.choose(cq).get)
      val ivm = new StandardIvm(cq)
      val grid = for (i <- 0 until n; j <- 0 until n)
        yield Tup(i.toLong, j.toLong)
      for (a <- Seq("G2", "G3", "G4"); t <- grid) {
        crown.processUpdate(Upd(a, t, isInsert = true))(_ => ())
        ivm.processUpdate(Upd(a, t, isInsert = true))(_ => ())
      }
      val c0 = crown.workOps; val i0 = ivm.workOps
      for (t <- grid) {
        crown.processUpdate(Upd("G1", t, isInsert = true))(_ => ())
        ivm.processUpdate(Upd("G1", t, isInsert = true))(_ => ())
      }
      val updates = (n * n).toDouble
      ((crown.workOps - c0) / updates, (ivm.workOps - i0) / updates)
    }
    val (c4, i4) = load(4)
    val (c8, i8) = load(8)
    // CROWN per-update work stays ~constant; standard CP grows polynomially
    assert(c8 / c4 < 2.5, s"CROWN per-update work grew: $c4 -> $c8")
    assert(i8 / i4 > 3.0, s"standard CP should blow up: $i4 -> $i8")
    assert(i8 > 10 * c8, s"standard CP ($i8) should dwarf CROWN ($c8)")
  }

  test("q-hierarchical star: O(1) amortized work under arbitrary updates (Lemma 6.8)") {
    val cq = Queries.star3(1000)
    val tree = JoinTree.choose(cq).get
    assert(tree.height == 1)
    def avgOps(m: Int): Double = {
      val rnd = new Random(2)
      val eng = new CrownEngine(cq, tree)
      val present = scala.collection.mutable.ArrayBuffer.empty[Tup.T]
      var ops0 = 0L
      for (_ <- 0 until m) {
        val ins = present.isEmpty || rnd.nextDouble() < 0.7
        val t = if (ins) Tup(rnd.nextInt(m / 4).toLong, rnd.nextInt(m / 4).toLong)
                else present.remove(rnd.nextInt(present.size))
        if (ins) present += t
        for (a <- Seq("G1", "G2", "G3")) eng.processUpdate(Upd(a, t, ins))(_ => ())
      }
      eng.workOps.toDouble / m
    }
    val a1 = avgOps(400); val a2 = avgOps(1600)
    assert(a2 / a1 < 1.6, s"work per update grew with stream length: $a1 -> $a2")
  }

  test("Lemma 6.9 consequence: FIFO 3-hop work per update is size-independent") {
    val cq = Queries.hop3Full(1000)
    val tree = JoinTree.choose(cq).get
    def avgOps(m: Int): Double = {
      val eng = new CrownEngine(cq, tree)
      val base = Updates.fifoWindow("G", randomEdges(m, m / 5, 3), w = m / 4)
      val perAtom = Updates.expandSelfJoin(base, Map("G" -> Seq("G1", "G2", "G3")))
      perAtom.foreach(u => eng.processUpdate(u)(_ => ()))
      eng.workOps.toDouble / perAtom.size
    }
    val a1 = avgOps(300); val a2 = avgOps(1200)
    assert(a2 / a1 < 2.0, s"FIFO work per update grew: $a1 -> $a2")
  }

  test("Fig 9 mechanism: work per update grows ~linearly with λ") {
    val cq = Queries.hop3Full(1000)
    val tree = JoinTree.choose(cq).get
    def opsPerUpdate(k: Int): Double = {
      val eng = new CrownEngine(cq, tree)
      val base = Updates.lambdaSequence("G", hubs = k, churns = k)
      val perAtom = Updates.expandSelfJoin(base, Map("G" -> Seq("G1", "G2", "G3")))
      perAtom.foreach(u => eng.processUpdate(u)(_ => ()))
      eng.workOps.toDouble / perAtom.size
    }
    val w4 = opsPerUpdate(4); val w16 = opsPerUpdate(16); val w64 = opsPerUpdate(64)
    assert(w16 > w4 && w64 > w16, s"work should grow with λ: $w4, $w16, $w64")
    assert(w64 / w16 > 2.0, s"growth too slow for Θ(λ): $w16 -> $w64")
  }

  test("Lemma 7.2: dumbbell GHD space stays within O(N^1.5)") {
    val eng = new BagEngine(Queries.dumbbellFull(1000).output)
    val n = 600
    val edges = randomEdges(n, 120, 4)
    for (e <- edges; a <- (1 to 7).map(i => s"G$i"))
      eng.processUpdate(Upd(a, e, isInsert = true))(_ => ())
    val bound = 40.0 * 7 * math.pow(n.toDouble, 1.5)
    assert(eng.spaceEntries < bound, s"space ${eng.spaceEntries} exceeds O(N^1.5) bound $bound")
  }

  test("insertion-only load builds the static index in ~linear work (Lemma 6.10)") {
    val cq = Queries.hop4Full(1000)
    val tree = JoinTree.choose(cq).get
    def totalOps(m: Int): Double = {
      val eng = new CrownEngine(cq, tree)
      for (e <- randomEdges(m, 4 * m / 5, 5); a <- Seq("G1", "G2", "G3", "G4"))
        eng.processUpdate(Upd(a, e, isInsert = true))(_ => ())
      eng.workOps.toDouble
    }
    val t1 = totalOps(500); val t2 = totalOps(2000)
    assert(t2 / t1 < 8.0, s"load work superlinear: $t1 -> $t2") // 4x data → <8x work
  }
}

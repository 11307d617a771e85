package repro.ghd

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EngineCheck, Tup, Upd}
import repro.workload.Queries
import scala.util.Random

/** §7.1 cyclic queries: the GHD bag engine for the dumbbell query against
  * brute force, plus the triangle view in isolation.
  */
class BagEngineSpec extends AnyFunSuite {

  private val g7 = Map("G" -> (1 to 7).map(i => s"G$i"))

  test("dumbbell full join via GHD bags matches brute force") {
    EngineCheck.checkEngine(Queries.dumbbellFull(1000), g7,
      () => new BagEngine(Queries.dumbbellFull(1000).output),
      seedBase = 41, rounds = 3, len = 60, nV = 4)
  }

  test("dumbbell projection via GHD bags matches brute force") {
    EngineCheck.checkEngine(Queries.dumbbellProj(1000), g7,
      () => new BagEngine(Queries.dumbbellProj(1000).output),
      seedBase = 42, rounds = 3, len = 60, nV = 4)
  }

  test("triangle view maintains the triangle join incrementally") {
    val rnd = new Random(7)
    val tri = new TriangleView("E1", "E2", "E3")
    val e = Array.fill(3)(scala.collection.mutable.Set.empty[(Long, Long)])
    val triangles = scala.collection.mutable.Set.empty[(Long, Long, Long)]
    for (_ <- 0 until 400) {
      val role = rnd.nextInt(3)
      val t = (rnd.nextInt(4).toLong, rnd.nextInt(4).toLong)
      val ins = !e(role).contains(t)
      if (ins) e(role) += t else e(role) -= t
      val deltas = tri.update(s"E${role + 1}", Tup(t._1, t._2), ins)
      for (d <- deltas) {
        val abc = (d(0).asInstanceOf[Long], d(1).asInstanceOf[Long], d(2).asInstanceOf[Long])
        if (ins) { assert(!triangles.contains(abc)); triangles += abc }
        else { assert(triangles.contains(abc)); triangles -= abc }
      }
      val expected = for {
        (a, b) <- e(0); (b2, c) <- e(1) if b2 == b; (c2, a2) <- e(2) if c2 == c && a2 == a
      } yield (a, b, c)
      assert(triangles == expected.toSet, s"triangle view diverged")
    }
  }

  test("bag engine plan height is 2 (Fig 5(b) shape)") {
    assert(new BagEngine(Queries.dumbbellFull(1000).output).planHeight <= 2)
  }
}

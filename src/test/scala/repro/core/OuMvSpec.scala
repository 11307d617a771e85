package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.stream.Updates
import repro.workload.Queries
import scala.util.Random

/** Theorem 6.2's reduction, run forward: CROWN over the constructed FIFO
  * sequence answers every `u_i M v_i` correctly (result non-emptiness at
  * each round boundary), for random OuMv instances.
  */
class OuMvSpec extends AnyFunSuite {

  private def boolMat(n: Int, rnd: Random, density: Double) =
    Array.fill(n, n)(rnd.nextDouble() < density)

  test("CROWN answers OuMv correctly over the Theorem 6.2 FIFO sequence") {
    for (seed <- 1 to 3) {
      val rnd = new Random(seed)
      val n = 10
      val m = boolMat(n, rnd, 0.3)
      val us = boolMat(n, rnd, 0.4)
      val vs = boolMat(n, rnd, 0.4)
      val (seq, boundaries) = Updates.ouMvSequence(m, us, vs)
      val tree = JoinTree.choose(Queries.thm62).get
      val eng = new CrownEngine(Queries.thm62, tree)
      var live = 0L
      var next = 0
      val answers = Vector.newBuilder[Boolean]
      for ((u, idx) <- seq.zipWithIndex) {
        val d = eng.processUpdate(u)(_ => ())
        live += (if (u.isInsert) d else -d)
        while (next < boundaries.size && boundaries(next) == idx + 1) {
          answers += (live > 0)
          next += 1
        }
      }
      val got = answers.result()
      val expected = (0 until n).map { i =>
        (0 until n).exists(j => us(i)(j) &&
          (0 until n).exists(l => m(j)(l) && vs(i)(l)))
      }
      assert(got.size == n)
      assert(got == expected, s"seed=$seed: got=$got expected=$expected")
      assert(live == eng.fullSet.size.toLong, "delta accounting drifted")
    }
  }
}

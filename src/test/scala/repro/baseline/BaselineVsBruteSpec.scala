package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{CQ, EngineCheck, IncrementalEngine}
import repro.workload.Queries

/** The comparison baselines must be correct too — the experiments are
  * meaningless otherwise. Same randomized ground-truth harness as CROWN.
  */
class BaselineVsBruteSpec extends AnyFunSuite {

  private val g3 = Map("G" -> Seq("G1", "G2", "G3"))
  private val g4 = Map("G" -> Seq("G1", "G2", "G3", "G4"))

  private def both(cq: CQ, copies: Map[String, Seq[String]], seed: Int,
                   len: Int = 60): Unit = {
    EngineCheck.checkEngine(cq, copies, () => new StandardIvm(cq), seed, rounds = 3, len = len)
    EngineCheck.checkEngine(cq, copies, () => new Hivm(cq), seed + 100, rounds = 3, len = len)
  }

  test("StandardIVM + HIVM: 3-hop full") { both(Queries.hop3Full(1000), g3, seed = 21) }
  test("StandardIVM + HIVM: 3-hop proj") { both(Queries.hop3Proj(1000), g3, seed = 22) }
  test("StandardIVM + HIVM: 4-hop full") { both(Queries.hop4Full(1000), g4, seed = 23, len = 45) }
  test("StandardIVM + HIVM: 4-hop proj") { both(Queries.hop4Proj(1000), g4, seed = 24, len = 45) }
  test("StandardIVM + HIVM: star") { both(Queries.star3(1000), g3, seed = 25) }
  test("StandardIVM + HIVM: 2-comb") {
    both(Queries.comb2(1000), Map("G" -> Seq("G1", "G2", "G3"),
      "V" -> Seq("V1"), "W" -> Seq("V2")), seed = 26)
  }
  test("StandardIVM + HIVM: filtered 3-hop (50%)") { both(Queries.hop3Full(500), g3, seed = 27) }
  test("StandardIVM + HIVM: thm62 path") {
    both(Queries.thm62, Map("a" -> Seq("R1"), "b" -> Seq("R2"), "c" -> Seq("R3"),
      "d" -> Seq("R4"), "e" -> Seq("R5")), seed = 28)
  }
  test("StandardIVM + HIVM: dumbbell full (7-way cyclic)") {
    both(Queries.dumbbellFull(1000), Map("G" -> (1 to 7).map(i => s"G$i")), seed = 29, len = 40)
  }
  test("StandardIVM + HIVM: SNB Q3 shape with result filter") {
    val cq = Queries.snbQ3(1000).copy(atomFilters = Map("message" ->
      ((t: repro.core.Tup.T) => t(2) == 0L)))
    both(cq, Map("knows" -> Seq("knows1", "knows2"), "message" -> Seq("message"),
      "message_tag" -> Seq("message_tag"), "tag" -> Seq("tag")), seed = 30, len = 45)
  }
}

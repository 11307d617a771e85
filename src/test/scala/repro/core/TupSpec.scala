package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tuple representation and projection compilation. */
class TupSpec extends AnyFunSuite {

  test("structural equality and hashing") {
    assert(Tup(1L, "a") == Tup(1L, "a"))
    assert(Tup(1L, "a").hashCode == Tup(1L, "a").hashCode)
    assert(Tup(1L, 2L) != Tup(2L, 1L))
    assert(Tup() == Tup.empty)
  }

  test("projIdx compiles positional projections") {
    val idx = Tup.projIdx(Seq("a", "b", "c"), Seq("c", "a"))
    assert(idx.toSeq == Seq(2, 0))
    assert(Tup.proj(Tup(10L, 20L, 30L), idx) == Tup(30L, 10L))
  }

  test("projIdx rejects unknown attributes") {
    intercept[IllegalArgumentException] {
      Tup.projIdx(Seq("a", "b"), Seq("z"))
    }
  }

  test("empty projection yields the empty tuple") {
    assert(Tup.proj(Tup(1L, 2L), Array.empty[Int]) == Tup.empty)
  }

  test("null values are first-class (IS NULL filters rely on it)") {
    val t = Tup(1L, null, 3L)
    assert(t(1) == null)
    assert(t == Tup(1L, null, 3L))
    assert(Tup.proj(t, Array(1)) == Tup(null))
  }
}

/** CQ model invariants. */
class QuerySpec extends AnyFunSuite {

  test("atoms must have distinct names and variables") {
    intercept[IllegalArgumentException] {
      Atom("R", Vector("x", "x"))
    }
    intercept[IllegalArgumentException] {
      CQ("bad", Vector(Atom("R", Vector("x")), Atom("R", Vector("y"))), Vector("x"))
    }
  }

  test("output attributes must be query variables") {
    intercept[IllegalArgumentException] {
      CQ("bad", Vector(Atom("R", Vector("x"))), Vector("z"))
    }
  }

  test("isFullJoin distinguishes full joins from join-projects") {
    assert(repro.workload.Queries.hop4Full(1000).isFullJoin)
    assert(!repro.workload.Queries.hop4Intro(1000).isFullJoin)
  }

  test("referenceSql joins every shared variable") {
    val sql = repro.workload.Queries.hop3Full(1000).referenceSql
    assert(sql.contains("G1.c1 = G2.c0"))
    assert(sql.contains("G2.c1 = G3.c0"))
    assert(sql.startsWith("SELECT DISTINCT"))
  }
}

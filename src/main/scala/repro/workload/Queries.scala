package repro.workload

import repro.core.{Atom, CQ}
import repro.core.Tup.T

/** The benchmark queries of §8 (graph pattern queries from [31] adapted to
  * the dynamic setting, LDBC-SNB Q1–Q4) plus the theory queries used by the
  * analysis sections, all as CQ objects.
  *
  * Graph queries are self-joins over one edge table `G`; [[graphCopies]]
  * maps the base table to its atom copies for update expansion (§3.1).
  * `FILTER OVER (col)` is the paper's output-size control: keep a tuple iff
  * its designated endpoint falls in the selected `permille` fraction
  * (deterministic by value, like a hash filter).
  */
object Queries {

  /** Keep `permille`/1000 of values (deterministic pseudo-hash filter). */
  def filterAtom(col: Int, permille: Int): T => Boolean =
    t => ((t(col).asInstanceOf[Long] * 2654435761L) % 1000 + 1000) % 1000 < permille

  private def isNull(col: Int): T => Boolean = t => t(col) == null

  // ------------------------------------------------------- graph queries

  def hop3Full(permille: Int = 100): CQ = CQ("3hop-full",
    Vector(Atom("G1", Vector("x1", "x2")), Atom("G2", Vector("x2", "x3")),
           Atom("G3", Vector("x3", "x4"))),
    Vector("x1", "x2", "x3", "x4"),
    atomFilters = if (permille >= 1000) Map.empty else Map("G3" -> filterAtom(1, permille)))

  def hop3Proj(permille: Int = 100): CQ =
    hop3Full(permille).copy(name = "3hop-proj", output = Vector("x2", "x3"))

  def hop4Full(permille: Int = 100): CQ = CQ("4hop-full",
    Vector(Atom("G1", Vector("x1", "x2")), Atom("G2", Vector("x2", "x3")),
           Atom("G3", Vector("x3", "x4")), Atom("G4", Vector("x4", "x5"))),
    Vector("x1", "x2", "x3", "x4", "x5"),
    atomFilters = if (permille >= 1000) Map.empty else Map("G4" -> filterAtom(1, permille)))

  /** The introduction's running example: π_{x1..x4} of the 4-hop join. */
  def hop4Intro(permille: Int = 100): CQ =
    hop4Full(permille).copy(name = "4hop-intro", output = Vector("x1", "x2", "x3", "x4"))

  def hop4Proj(permille: Int = 100): CQ =
    hop4Full(permille).copy(name = "4hop-proj", output = Vector("x2", "x3", "x4"))

  def star3(permille: Int = 100): CQ = CQ("star",
    Vector(Atom("G1", Vector("x0", "x1")), Atom("G2", Vector("x0", "x2")),
           Atom("G3", Vector("x0", "x3"))),
    Vector("x0", "x1", "x2", "x3"),
    atomFilters = if (permille >= 1000) Map.empty else Map("G3" -> filterAtom(1, permille)))

  def comb2(permille: Int = 100): CQ = CQ("2comb",
    Vector(Atom("G1", Vector("x1", "x2")), Atom("G2", Vector("x2", "x3")),
           Atom("G3", Vector("x3", "x4")),
           Atom("V1", Vector("x1")), Atom("V2", Vector("x4"))),
    Vector("x1", "x2", "x3", "x4"),
    atomFilters = if (permille >= 1000) Map.empty else Map("V2" -> filterAtom(0, permille)))

  val dumbbellAtoms: Vector[Atom] = Vector(
    Atom("G1", Vector("x1", "x2")), Atom("G2", Vector("x2", "x3")),
    Atom("G3", Vector("x3", "x1")), Atom("G4", Vector("x3", "x4")),
    Atom("G5", Vector("x4", "x5")), Atom("G6", Vector("x5", "x6")),
    Atom("G7", Vector("x6", "x4")))

  def dumbbellFull(permille: Int = 100): CQ = CQ("dumbbell-full", dumbbellAtoms,
    Vector("x1", "x2", "x3", "x4", "x5", "x6"),
    atomFilters = if (permille >= 1000) Map.empty else Map("G4" -> filterAtom(1, permille)))

  def dumbbellProj(permille: Int = 100): CQ =
    dumbbellFull(permille).copy(name = "dumbbell-proj", output = Vector("x3", "x4"))

  /** Base-table → atom copies for the graph self-joins. */
  def graphCopies(cq: CQ): Map[String, Seq[String]] = {
    val gs = cq.atoms.map(_.name).filter(_.startsWith("G"))
    val vs = cq.atoms.map(_.name).filter(_.startsWith("V"))
    Map("G" -> gs) ++ (if (vs.nonEmpty) Map("V" -> vs) else Map.empty)
  }

  // --------------------------------------------------------- SNB queries

  /** SNB Q1: a person's messages visible to their followers. */
  def snbQ1: CQ = CQ("snb-q1",
    Vector(Atom("person", Vector("p", "fn", "ln")),
           Atom("message", Vector("m", "p", "ro")),
           Atom("knows", Vector("k1", "p"))),
    Vector("p", "fn", "ln", "m", "k1"))

  /** SNB Q2: tagged root messages two hops out, filtered on the start person. */
  def snbQ2(permille: Int = 100): CQ = CQ("snb-q2",
    Vector(Atom("knows1", Vector("a", "b")), Atom("knows2", Vector("b", "c")),
           Atom("message", Vector("m", "c", "ro")),
           Atom("message_tag", Vector("m", "t")), Atom("tag", Vector("t", "nm"))),
    Vector("a", "b", "c", "t", "m"),
    atomFilters = Map("message" -> isNull(2)) ++
      (if (permille >= 1000) Map.empty[String, T => Boolean]
       else Map("knows1" -> filterAtom(0, permille))))

  /** SNB Q3 = Q2 plus the cross-relation inequality k2.p2 <> k1.p1. */
  def snbQ3(permille: Int = 100): CQ =
    snbQ2(permille).copy(name = "snb-q3",
      resultFilter = Some(t => t(2) != t(0))) // c <> a in output order (a,b,c,t,m)

  /** SNB Q4 before aggregation: the free-connex extension with the message
    * id as an output; COUNT(DISTINCT m) GROUP BY (nm, t) is layered on top
    * via [[repro.core.GroupCountDistinctAdapter]].
    */
  def snbQ4Extended(permille: Int = 100): CQ = CQ("snb-q4",
    Vector(Atom("tag", Vector("t", "nm")), Atom("message_tag", Vector("m", "t")),
           Atom("message", Vector("m", "c", "ro")), Atom("knows", Vector("k1", "c"))),
    Vector("nm", "t", "m"),
    atomFilters = Map("message" -> isNull(2)) ++
      (if (permille >= 1000) Map.empty[String, T => Boolean]
       else Map("knows" -> filterAtom(0, permille))))

  def snbCopies(cq: CQ): Map[String, Seq[String]] = {
    val ks = cq.atoms.map(_.name).filter(_.startsWith("knows"))
    Map("knows" -> ks, "person" -> Seq("person"), "message" -> Seq("message"),
      "message_tag" -> Seq("message_tag"), "tag" -> Seq("tag"))
      .filter { case (_, as) => as.forall(a => cq.atoms.exists(_.name == a)) }
  }

  // -------------------------------------------------------- theory queries

  /** Theorem 6.2's hard free-connex query (5-path with unary endpoints). */
  val thm62: CQ = CQ("thm62",
    Vector(Atom("R1", Vector("x1")), Atom("R2", Vector("x1", "x2")),
           Atom("R3", Vector("x2", "x3")), Atom("R4", Vector("x3", "x4")),
           Atom("R5", Vector("x4"))),
    Vector("x1", "x2", "x3", "x4"))

  /** Theorem 6.7's lower-bound query π_{x1}(R1(x1,x2) ⋈ R2(x2)). */
  val thm67: CQ = CQ("thm67",
    Vector(Atom("R1", Vector("x1", "x2")), Atom("R2", Vector("x2"))),
    Vector("x1"))

  /** Figure 2's running example Q1 = R1(x1,x2) ⋈ R2(x2,x3). */
  def fig2(output: Vector[String]): CQ = CQ("fig2",
    Vector(Atom("R1", Vector("x1", "x2")), Atom("R2", Vector("x2", "x3"))), output)
}

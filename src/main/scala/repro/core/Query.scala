package repro.core

import repro.core.Tup.T

/** One occurrence of a relation in a conjunctive query.
  *
  * `name` is the logical relation name unique within the query (self-joins
  * use one atom per occurrence, e.g. `G1`, `G2` over the same base table,
  * per §3.1 of the paper). `attrs` are the query variables bound to the
  * relation's columns, in column order. Variables repeated across atoms are
  * equi-join conditions.
  */
final case class Atom(name: String, attrs: Vector[String]) {
  require(attrs.distinct.size == attrs.size, s"atom $name repeats a variable")
}

/** A conjunctive query `π_output (atom_1 ⋈ ... ⋈ atom_n)` with optional
  * per-atom selections (§7.2: checked on ingest, updates failing the filter
  * are discarded) and an optional predicate over whole results (used for
  * SNB Q3's cross-relation inequality; applied at enumeration time).
  *
  * @param name         query identifier (bench/report label)
  * @param atoms        relation occurrences; names must be distinct
  * @param output       output variables `y` in result-column order
  * @param atomFilters  per-atom tuple predicates (selection σ on that atom)
  * @param resultFilter predicate over output tuples (ordered by `output`)
  */
final case class CQ(
    name: String,
    atoms: Vector[Atom],
    output: Vector[String],
    atomFilters: Map[String, T => Boolean] = Map.empty,
    resultFilter: Option[T => Boolean] = None,
) {
  require(atoms.map(_.name).distinct.size == atoms.size, "atom names must be distinct")

  /** All query variables. */
  val allVars: Vector[String] = atoms.flatMap(_.attrs).distinct

  require(output.forall(allVars.contains), s"output ${output} must be query variables")

  /** Atom lookup by name. */
  val atomByName: Map[String, Atom] = atoms.map(a => a.name -> a).toMap

  /** Is this a full join query (every variable is output)? */
  def isFullJoin: Boolean = allVars.forall(output.contains)

  /** The same query with a different output list (used by the §7.1
    * free-connex extension that adds variables to `y`).
    */
  def withOutput(y: Vector[String]): CQ = copy(output = y)

  /** Reference SQL over per-atom tables named exactly like the atoms
    * (each atom gets its own table; the driver materializes one table per
    * atom even for self-joins so Spark and DuckDB see identical input).
    * `distinct` matters for join-project queries under set semantics.
    */
  def referenceSql: String = {
    val select = output.map { v =>
      val a = atoms.find(_.attrs.contains(v)).get
      s"${a.name}.c${a.attrs.indexOf(v)} AS $v"
    }.mkString(", ")
    val from = atoms.map(_.name).mkString(", ")
    val joins = for {
      v <- allVars
      occ = atoms.filter(_.attrs.contains(v))
      if occ.size > 1
      (a, b) <- occ.zip(occ.tail)
    } yield s"${a.name}.c${a.attrs.indexOf(v)} = ${b.name}.c${b.attrs.indexOf(v)}"
    val where = if (joins.isEmpty) "" else " WHERE " + joins.mkString(" AND ")
    s"SELECT DISTINCT $select FROM $from$where"
  }
}

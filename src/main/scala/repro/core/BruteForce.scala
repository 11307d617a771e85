package repro.core

import repro.core.Tup.T
import scala.collection.mutable

/** Reference CQ evaluator for tests: plain backtracking join, no indexes
  * beyond per-atom scans. Exponential in the worst case — only ever used on
  * the tiny instances the property tests generate, where it is the ground
  * truth that the incremental engines are checked against.
  */
object BruteForce {

  /** Evaluate `cq` over `db` (atom name -> set of tuples, positionally
    * matching the atom's attribute vector). Returns the set of distinct
    * output tuples (set semantics, like the paper).
    */
  def eval(cq: CQ, db: Map[String, collection.Set[T]]): Set[T] = {
    val results = mutable.HashSet.empty[T]
    val binding = mutable.HashMap.empty[String, Any]

    def go(i: Int): Unit = {
      if (i == cq.atoms.length) {
        val out = Tup(cq.output.map(binding): _*)
        if (cq.resultFilter.forall(_(out))) results += out
      } else {
        val atom = cq.atoms(i)
        val filt = cq.atomFilters.get(atom.name)
        for (t <- db.getOrElse(atom.name, Set.empty[T]) if filt.forall(_(t))) {
          var ok = true
          val bound = mutable.ArrayBuffer.empty[String]
          var j = 0
          while (ok && j < atom.attrs.length) {
            val v = atom.attrs(j)
            binding.get(v) match {
              case Some(x) => ok = x == t(j)
              case None    => binding(v) = t(j); bound += v
            }
            j += 1
          }
          if (ok) go(i + 1)
          bound.foreach(binding.remove)
        }
      }
    }

    go(0)
    results.toSet
  }

  /** The delta `ΔQ(D, t)` of applying one update, computed from scratch:
    * `Q(after) - Q(before)` for insertions, `Q(before) - Q(after)` for
    * deletions (§3.1). `before`/`after` are full snapshots.
    */
  def delta(cq: CQ, before: Map[String, collection.Set[T]],
            after: Map[String, collection.Set[T]], isInsert: Boolean): Set[T] = {
    val qb = eval(cq, before)
    val qa = eval(cq, after)
    if (isInsert) qa -- qb else qb -- qa
  }
}

package repro.core

import repro.core.Tup.T
import scala.collection.mutable

/** One update: insertion or deletion of tuple `t` in relation (atom) `rel`
  * at logical time `ts` (§3.1). Set semantics; ineffective updates (inserting
  * a present tuple / deleting an absent one) are ignored by engines.
  */
final case class Upd(rel: String, t: T, isInsert: Boolean, ts: Long = 0L)

/** Common surface of all incremental engines compared in the experiments
  * (CROWN, standard change propagation, HIVM, GHD bag engine).
  *
  * An engine is the paper's stream-in/stream-out operator: `processUpdate`
  * consumes one base-table update and pushes the delta `ΔQ(D,t)` (insertion
  * updates push new results, deletion updates push disappearing results);
  * `enumerateFull` is the pull-based full-enumeration mode.
  */
trait IncrementalEngine {

  /** Engine label used in benchmark tables. */
  def name: String

  /** Apply one update; `emit` receives every delta result as a tuple ordered
    * by the query's output attributes. Returns the number of results emitted.
    */
  def processUpdate(u: Upd)(emit: T => Unit): Long

  /** Enumerate the current full result; `cb` returns false to stop early
    * (constant-delay enumeration never materializes the result first).
    */
  def enumerateFull(cb: T => Boolean): Unit

  /** Materialized snapshot of the full result (tests / small data only). */
  def fullSet: Set[T] = {
    val s = mutable.HashSet.empty[T]
    enumerateFull { t => s += t; true }
    s.toSet
  }

  /** Total stored entries across all views/indexes — the space metric. */
  def spaceEntries: Long

  /** Work counter (counter changes + index probes) — the abstract update
    * cost that Theorem 6.6 bounds by O(λ_T).
    */
  def workOps: Long
}

package repro.core

import scala.collection.mutable

/** Enclosureness of update sequences (§6): the instance-specific hardness
  * measure that Theorem 6.6 proves bounds CROWN's amortized update cost.
  *
  *   - [[lambda]] is the original time-only Definition 6.1 from [37];
  *   - [[lambdaTree]] is the paper's refined join-tree-specific Definition
  *     6.4 over *effective* lifespans (Def 6.3).
  *
  * Both are computed exactly by greedy earliest-end interval scheduling
  * (optimal for max disjoint intervals; with the two candidate effective
  * lifespans per tuple we greedily pick whichever compatible candidate ends
  * first, which preserves optimality by the standard exchange argument).
  * Quadratic-ish in sequence length — intended for analysis and tests, not
  * for the hot path.
  */
object Enclosureness {

  /** A tuple lifespan `[plus, minus]` (Def 6.1's I(t)); `rel` is the atom
    * the tuple lives in. `-Long.MaxValue`/`Long.MaxValue` encode ±∞.
    */
  final case class Life(rel: String, plus: Long, minus: Long)

  /** Extract lifespans from a timestamped update sequence: each insert opens
    * a lifespan, the next delete of the same (rel, tuple) closes it; repeated
    * insert/delete pairs become separate lifespans (§6.1). Tuples never
    * deleted get minus = +∞; tuples deleted but never inserted (present in
    * the initial database) get plus = −∞.
    */
  def lifespans(updates: Seq[Upd]): Vector[Life] = {
    val open = mutable.HashMap.empty[(String, Tup.T), Long]
    val out = mutable.ArrayBuffer.empty[Life]
    for (u <- updates) {
      val k = (u.rel, u.t)
      if (u.isInsert) open(k) = u.ts
      else {
        val plus = open.remove(k).getOrElse(-Long.MaxValue)
        out += Life(u.rel, plus, u.ts)
      }
    }
    for (((rel, _), plus) <- open) out += Life(rel, plus, Long.MaxValue)
    out.toVector
  }

  /** Max number of pairwise-disjoint candidate intervals contained in
    * `[lo, hi]`, at most one candidate per tuple (greedy by earliest end).
    * `cands(i)` lists tuple i's candidate intervals.
    */
  private def maxDisjoint(cands: Seq[Seq[(Long, Long)]], lo: Long, hi: Long,
                          selfIdx: Int = -1): Int = {
    val flat = for {
      (cs, i) <- cands.zipWithIndex
      if i != selfIdx
      (a, b) <- cs
      if a >= lo && b <= hi && a > -Long.MaxValue && b < Long.MaxValue
    } yield (b, a, i)
    val used = mutable.HashSet.empty[Int]
    var cur = Long.MinValue
    var n = 0
    for ((b, a, i) <- flat.sorted) {
      if (!used.contains(i) && a > cur) { used += i; cur = b; n += 1 }
    }
    n
  }

  /** Definition 6.1: average over tuples of the max number of disjoint
    * lifespans contained in the tuple's lifespan; at least 1 overall.
    */
  def lambda(updates: Seq[Upd]): Double = {
    val ls = lifespans(updates)
    if (ls.isEmpty) return 1.0
    val cands = ls.map(l => Seq((l.plus, l.minus)))
    val total = ls.zipWithIndex
      .map { case (t, i) => maxDisjoint(cands, t.plus, t.minus, i).toDouble }.sum
    math.max(total / ls.size, 1.0)
  }

  /** Effective lifespans Î and Ǐ of Definition 6.3 for a tuple in node `e`:
    * Î moves the end forward to the first deletion in a strict descendant
    * after the tuple's insertion; Ǐ moves the start back to the last
    * insertion in a strict descendant before the tuple's deletion.
    */
  private def effective(l: Life, descLives: Seq[Life]): Seq[(Long, Long)] = {
    val firstDel = descLives.iterator.map(_.minus).filter(_ > l.plus)
      .foldLeft(Long.MaxValue)(math.min)
    val lastIns = descLives.iterator.map(_.plus).filter(_ < l.minus)
      .foldLeft(-Long.MaxValue)(math.max)
    Seq((l.plus, math.min(l.minus, firstDel)), (math.max(l.plus, lastIns), l.minus))
  }

  /** Definition 6.4: join-tree-specific enclosureness λ_T. For each tuple t
    * in node e, counts the max number of disjoint effective lifespans of
    * strict-descendant tuples contained in I(t); averaged (min 1).
    */
  def lambdaTree(cq: CQ, tree: JTNode, updates: Seq[Upd]): Double = {
    val ls = lifespans(updates)
    if (ls.isEmpty) return 1.0
    // atom -> strict descendant atoms in the tree
    def atomsBelow(n: JTNode): Vector[String] = n.allNodes.flatMap(_.atomName.toVector)
    val desc: Map[String, Vector[String]] = {
      val m = mutable.HashMap.empty[String, Vector[String]]
      def rec(n: JTNode): Unit = {
        n.atomName.foreach(a => m(a) = n.children.flatMap(atomsBelow))
        n.children.foreach(rec)
      }
      rec(tree)
      m.toMap
    }
    val byRel = ls.groupBy(_.rel)
    val total = ls.map { t =>
      val below = desc.getOrElse(t.rel, Vector.empty)
      val descLives = below.flatMap(r => byRel.getOrElse(r, Vector.empty))
      val cands = descLives.map { l =>
        // a descendant tuple's own effective lifespans use its own descendants;
        // since all of those are also strict descendants of t's node, computing
        // against the same pool is exact for chains and conservative otherwise
        val own = desc.getOrElse(l.rel, Vector.empty)
          .flatMap(r => byRel.getOrElse(r, Vector.empty))
        effective(l, own)
      }
      math.max(maxDisjoint(cands, t.plus, t.minus).toDouble, 1.0)
    }.sum
    math.max(total / ls.size, 1.0)
  }
}

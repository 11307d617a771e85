package repro.stream

import org.apache.spark.sql.SparkSession
import repro.core._

/** Distributed CROWN on Spark (§8.1: "we borrow a similar idea from
  * massively parallel algorithms, such as HyperCube").
  *
  * One-dimensional HyperCube sharding: pick a partition attribute from the
  * plan's root (every result carries it, so shard outputs are disjoint by
  * construction and no dedup is needed); updates whose atom contains the
  * attribute go to shard `hash(value) mod p`, updates to atoms without it
  * are replicated to every shard — exactly the broadcast dimension of a
  * HyperCube grid, and the reason speedup turns sublinear at high p.
  *
  * Each shard runs a full [[CrownEngine]] inside one Spark task over its
  * pre-sharded update stream (an operator instance per partition, as the
  * repro maps Flink operators onto Spark).
  */
object Hypercube {

  /** Partition attribute: first root attribute (always output-carrying). */
  def partitionAttr(tree: JTNode): String = tree.attrs.head

  /** Shard a per-atom update sequence. */
  def shard(cq: CQ, tree: JTNode, updates: Seq[Upd], p: Int): IndexedSeq[Vector[Upd]] = {
    val attr = partitionAttr(tree)
    val pos: Map[String, Int] = cq.atoms.map(a => a.name -> a.attrs.indexOf(attr)).toMap
    val buckets = IndexedSeq.fill(p)(Vector.newBuilder[Upd])
    for (u <- updates) {
      val i = pos(u.rel)
      if (i < 0) buckets.foreach(_ += u) // broadcast dimension
      else {
        val h = ((u.t(i).hashCode * 2654435761L) % p + p) % p
        buckets(h.toInt) += u
      }
    }
    buckets.map(_.result())
  }

  final case class ShardStats(shard: Int, updates: Long, deltas: Long, millis: Double,
                              space: Long)

  /** Result of one parallel run: wall-clock time of the slowest shard (the
    * makespan the paper's Fig 10 plots), plus per-shard stats.
    */
  final case class ParStats(p: Int, makespanMillis: Double, wallMillis: Double,
                            totalDeltas: Long, shards: Seq[ShardStats])

  /** Run the sharded streams as one Spark job with `p` tasks. */
  def runParallel(spark: SparkSession, cq: CQ, tree: JTNode, updates: Seq[Upd],
                  p: Int): ParStats = {
    val shards = shard(cq, tree, updates, p)
    val rdd = spark.sparkContext.parallelize(shards.zipWithIndex.map(_.swap), p)
    val t0 = System.nanoTime()
    val stats = rdd.map { case (i, us) =>
      val eng = new CrownEngine(cq, tree)
      val s0 = System.nanoTime()
      var deltas = 0L
      us.foreach(u => deltas += eng.processUpdate(u)(_ => ()))
      ShardStats(i, us.size.toLong, deltas, (System.nanoTime() - s0) / 1e6,
        eng.spaceEntries)
    }.collect().toSeq
    val wall = (System.nanoTime() - t0) / 1e6
    ParStats(p, stats.map(_.millis).max, wall, stats.map(_.deltas).sum, stats)
  }
}

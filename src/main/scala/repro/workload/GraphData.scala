package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Tup
import repro.core.Tup.T

/** Synthetic graph workload standing in for the SNAP *Epinions* graph of the
  * paper's experiments (offline container → no downloads; substitution
  * documented in DESIGN.md). Degrees are heavy-tailed (inverse-CDF power
  * law), which is what makes multi-hop self-joins blow up the way the
  * evaluation relies on.
  */
object GraphData {

  /** Power-law directed edges as a DataFrame (src, dst), deterministic in
    * (nVertices, nEdges, seed). Duplicates removed, self-loops kept (they
    * exist in SNAP graphs too).
    */
  def edges(spark: SparkSession, nVertices: Long, nEdges: Long,
            alpha: Double = 1.6, seed: Long = 42): DataFrame = {
    def drawCol(c: org.apache.spark.sql.Column) =
      least(lit(nVertices - 1), greatest(lit(0L),
        (pow(c, lit(-1.0 / (alpha - 1.0))) - 1.0).cast(LongType) % nVertices))
    spark.range(nEdges * 6) // oversample, dedupe, trim
      .select(
        drawCol(rand(seed) + lit(1e-12)) as "src",
        drawCol(rand(seed + 1) + lit(1e-12)) as "dst")
      .distinct()
      .limit(nEdges.toInt)
  }

  /** Collected deterministic edge list for driver-side streaming. */
  def edgesLocal(spark: SparkSession, nVertices: Long, nEdges: Long,
                 alpha: Double = 1.6, seed: Long = 42): Vector[T] = {
    edges(spark, nVertices, nEdges, alpha, seed)
      .collect()
      .map(r => Tup(r.getLong(0), r.getLong(1)))
      .toVector
      .sortBy(t => (t(0).asInstanceOf[Long], t(1).asInstanceOf[Long]))
  }

  /** Distinct vertices of an edge list (for the comb query's V1/V2). */
  def verticesOf(edges: Seq[T]): Vector[T] =
    edges.flatMap(t => Seq(t(0), t(1))).distinct.sorted(Ordering.by((a: Any) => a.asInstanceOf[Long]))
      .map(v => Tup(v)).toVector
}

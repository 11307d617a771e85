package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Tup
import repro.core.Tup.T

/** LDBC-SNB-lite: a scale-factor-parameterized synthetic stand-in for the
  * LDBC Social Network Benchmark tables the paper's SNB Q1–Q4 run on
  * (person, knows, tag, message, message_tag). Referential integrity holds
  * by construction; messages carry an insertion timestamp (days) used by the
  * time-based FIFO window, and ~30% of messages are replies (m_c_replyof
  * non-null) so the `IS NULL` selection of Q2–Q4 bites. Deterministic in
  * (sf, seed). SF=1 here is laptop-scale (~50K messages), not LDBC SF1 —
  * the shape, not the size, is what the experiments need (DESIGN.md).
  */
object SnbData {

  final case class Sizes(persons: Long, knows: Long, tags: Long,
                         messages: Long, messageTags: Long)

  def sizes(sf: Double): Sizes = Sizes(
    persons = math.max(20, (1000 * sf).toLong),
    knows = math.max(40, (8000 * sf).toLong),
    tags = math.max(5, (80 * math.sqrt(sf)).toLong),
    messages = math.max(50, (20000 * sf).toLong),
    messageTags = math.max(50, (30000 * sf).toLong))

  /** Timeline length in days; message timestamps are uniform over it. */
  val Days = 300L

  def person(spark: SparkSession, sf: Double, seed: Long = 7): DataFrame = {
    val s = sizes(sf)
    spark.range(s.persons).select(
      col("id") as "p_personid",
      concat(lit("fn"), col("id") % 97) as "p_firstname",
      concat(lit("ln"), col("id") % 101) as "p_lastname")
  }

  def knows(spark: SparkSession, sf: Double, seed: Long = 8): DataFrame = {
    val s = sizes(sf)
    spark.range(s.knows).select(
      (rand(seed) * s.persons).cast(LongType) as "k_person1id",
      (rand(seed + 1) * s.persons).cast(LongType) as "k_person2id",
      (rand(seed + 2) * Days).cast(LongType) as "k_ts").distinct()
  }

  def tag(spark: SparkSession, sf: Double): DataFrame = {
    val s = sizes(sf)
    spark.range(s.tags).select(
      col("id") as "t_tagid",
      concat(lit("tag"), col("id")) as "t_name")
  }

  def message(spark: SparkSession, sf: Double, seed: Long = 9): DataFrame = {
    val s = sizes(sf)
    spark.range(s.messages).select(
      col("id") as "m_messageid",
      (rand(seed) * s.persons).cast(LongType) as "m_creatorid",
      when(rand(seed + 1) < 0.3, (rand(seed + 2) * s.messages).cast(LongType))
        .otherwise(lit(null).cast(LongType)) as "m_c_replyof",
      (rand(seed + 3) * Days).cast(LongType) as "m_ts")
  }

  def messageTag(spark: SparkSession, sf: Double, seed: Long = 10): DataFrame = {
    val s = sizes(sf)
    spark.range(s.messageTags).select(
      (rand(seed) * s.messages).cast(LongType) as "mt_messageid",
      // zipf-ish tag popularity
      least(lit(s.tags - 1),
        (pow(rand(seed + 1) + lit(1e-12), lit(-1.25)) - 1.0).cast(LongType) % s.tags)
        as "mt_tagid").distinct()
  }

  /** Timestamped local rows per base relation: (rel, tuple, ts-in-days).
    * Static-ish tables (person/tag) get ts 0 so they live for the whole
    * stream; knows/message/message_tag arrive over the timeline.
    */
  def localRows(spark: SparkSession, sf: Double): Vector[(String, T, Long)] = {
    def l(r: org.apache.spark.sql.Row, i: Int): Any = r.get(i)
    val p = person(spark, sf).collect().map(r => ("person", Tup(r.get(0), r.get(1), r.get(2)), 0L))
    val k = knows(spark, sf).collect().map(r => ("knows", Tup(r.get(0), r.get(1)), r.getLong(2)))
    val t = tag(spark, sf).collect().map(r => ("tag", Tup(r.get(0), r.get(1)), 0L))
    val m = message(spark, sf).collect().map(r =>
      ("message", Tup(r.get(0), r.get(1), r.get(2)), r.getLong(3)))
    val mt = messageTag(spark, sf).collect().map { r =>
      ("message_tag", Tup(r.get(0), r.get(1)), math.abs((l(r, 0).asInstanceOf[Long] * 7 + 3) % Days))
    }
    (p ++ k ++ t ++ m ++ mt).toVector
  }
}

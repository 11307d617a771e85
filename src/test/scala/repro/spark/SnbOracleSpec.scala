package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types.{StringType, StructField, StructType}
import repro.core._
import repro.core.Tup.T
import repro.workload.{Queries, SnbData}
import repro.{Oracle, SparkSpec}

/** SNB Q1–Q4 against the DuckDB oracle over SNB-lite data (nulls included —
  * Q2–Q4 filter on `m_c_replyof IS NULL`).
  */
class SnbOracleSpec extends SparkSpec {

  private def toDf(rows: Seq[Seq[Any]], cols: Seq[String]): DataFrame = {
    val schema = StructType(cols.map(c => StructField(c, StringType, nullable = true)))
    val rdd = spark.sparkContext.parallelize(
      rows.map(r => org.apache.spark.sql.Row.fromSeq(
        r.map(v => if (v == null) null else v.toString))), 4)
    spark.createDataFrame(rdd, schema)
  }

  private lazy val rows = SnbData.localRows(spark, sf = 0.05)
  private lazy val byRel: Map[String, Seq[T]] =
    rows.groupBy(_._1).view.mapValues(_.map(_._2)).toMap

  private def loadEngine(cq: CQ, engine: IncrementalEngine): Unit = {
    val copies = Queries.snbCopies(cq)
    for ((base, tuples) <- byRel if copies.contains(base);
         t <- tuples; atom <- copies(base))
      engine.processUpdate(Upd(atom, t, isInsert = true))(_ => ())
  }

  /** Atom tables with the engine-side selections pre-applied. */
  private def atomTables(cq: CQ): Seq[(String, DataFrame)] = {
    val copies = Queries.snbCopies(cq)
    cq.atoms.map { a =>
      val base = copies.collectFirst { case (b, as) if as.contains(a.name) => b }.get
      val filt = cq.atomFilters.get(a.name)
      val data = byRel(base).filter(t => filt.forall(_(t))).map(_.toSeq)
      a.name -> toDf(data, a.attrs.indices.map(i => s"c$i"))
    }
  }

  test("SNB Q1: CROWN == DuckDB") {
    val cq = Queries.snbQ1
    val engine = Compiler.compile(cq)
    loadEngine(cq, engine)
    Oracle.assertEquivalent(toDf(engine.fullSet.toSeq.map(_.toSeq), cq.output),
      cq.referenceSql, atomTables(cq): _*)
  }

  test("SNB Q2 (reply-of IS NULL + 10% filter): CROWN == DuckDB") {
    val cq = Queries.snbQ2(100)
    val engine = Compiler.compile(cq)
    loadEngine(cq, engine)
    Oracle.assertEquivalent(toDf(engine.fullSet.toSeq.map(_.toSeq), cq.output),
      cq.referenceSql, atomTables(cq): _*)
  }

  test("SNB Q3 (cross-relation inequality): CROWN == DuckDB") {
    val cq = Queries.snbQ3(100)
    val engine = Compiler.compile(cq)
    loadEngine(cq, engine)
    val sql = cq.referenceSql + " AND knows2.c1 <> knows1.c0" // c <> a
    Oracle.assertEquivalent(toDf(engine.fullSet.toSeq.map(_.toSeq), cq.output),
      sql, atomTables(cq): _*)
  }

  test("SNB Q4 (GROUP BY + COUNT DISTINCT): adapter == DuckDB") {
    val cq = Queries.snbQ4Extended(100)
    val engine = new GroupCountDistinctAdapter(Compiler.compile(cq), cq.output,
      Vector("nm", "t"), "m")
    loadEngine(cq, engine)
    val sql = "SELECT tag.c1 AS nm, tag.c0 AS t, " +
      "COUNT(DISTINCT message_tag.c0) AS cnt " +
      "FROM tag, message_tag, message, knows " +
      "WHERE message_tag.c1 = tag.c0 AND message.c0 = message_tag.c0 " +
      "AND knows.c1 = message.c1 GROUP BY tag.c1, tag.c0"
    Oracle.assertEquivalent(
      toDf(engine.fullSet.toSeq.map(_.toSeq), Vector("nm", "t", "cnt")),
      sql, atomTables(cq): _*)
  }
}

package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types.{StringType, StructField, StructType}
import repro.core._
import repro.core.Tup.T
import repro.workload.{GraphData, Queries}
import repro.{Oracle, SparkSpec}

/** End-to-end correctness on Spark-generated graph data: CROWN's full
  * enumeration (after an insertion-only load) must equal the reference SQL
  * evaluated by BOTH Spark SQL (Catalyst) and DuckDB (via [[Oracle]]).
  * This is the result-equality oracle the task mandates — a broken operator
  * or a wrong plan rewrite fails here, not just "it ran".
  */
class OracleGraphSpec extends SparkSpec {

  private def toDf(rows: Seq[Seq[Any]], cols: Seq[String]): DataFrame = {
    val schema = StructType(cols.map(c => StructField(c, StringType, nullable = true)))
    val rdd = spark.sparkContext.parallelize(
      rows.map(r => org.apache.spark.sql.Row.fromSeq(
        r.map(v => if (v == null) null else v.toString))), 4)
    spark.createDataFrame(rdd, schema)
  }

  /** Load, enumerate, and check one graph query against both oracles. */
  private def checkGraph(cq: CQ, copies: Map[String, Seq[String]],
                         baseTuples: Map[String, Seq[T]]): Unit = {
    val engine = Compiler.compile(cq)
    for ((base, tuples) <- baseTuples; t <- tuples; atom <- copies(base))
      engine.processUpdate(Upd(atom, t, isInsert = true))(_ => ())
    val crownDf = toDf(engine.fullSet.toSeq.map(_.toSeq), cq.output)

    // per-atom tables with the atom's selection already applied, so the
    // filter-free reference SQL is equivalent on both engines
    val atomTables = cq.atoms.map { a =>
      val base = copies.collectFirst { case (b, as) if as.contains(a.name) => b }.get
      val filt = cq.atomFilters.get(a.name)
      val rows = baseTuples(base).filter(t => filt.forall(_(t))).map(_.toSeq)
      a.name -> toDf(rows, a.attrs.indices.map(i => s"c$i"))
    }

    // Spark SQL (Catalyst) reference
    atomTables.foreach { case (n, df) => df.createOrReplaceTempView(n) }
    val sparkRes = spark.sql(cq.referenceSql).collect()
      .map(r => Tup(r.toSeq.map(v => if (v == null) null else v.toString): _*)).toSet
    val crownStr = engine.fullSet.map(t => Tup(t.toSeq.map(v =>
      if (v == null) null else v.toString): _*))
    assert(crownStr == sparkRes,
      s"${cq.name}: CROWN vs Spark SQL mismatch (${crownStr.size} vs ${sparkRes.size})")

    // DuckDB reference through the provided oracle
    Oracle.assertEquivalent(crownDf, cq.referenceSql, atomTables: _*)
  }

  private lazy val edges = GraphData.edgesLocal(spark, nVertices = 300, nEdges = 1500)
  private lazy val verts = GraphData.verticesOf(edges)

  test("3-hop full join: CROWN == Spark SQL == DuckDB") {
    checkGraph(Queries.hop3Full(100), Map("G" -> Seq("G1", "G2", "G3")),
      Map("G" -> edges))
  }

  test("3-hop join-project: CROWN == Spark SQL == DuckDB") {
    checkGraph(Queries.hop3Proj(1000), Map("G" -> Seq("G1", "G2", "G3")),
      Map("G" -> edges))
  }

  test("4-hop join-project: CROWN == Spark SQL == DuckDB") {
    checkGraph(Queries.hop4Proj(1000), Map("G" -> Seq("G1", "G2", "G3", "G4")),
      Map("G" -> edges))
  }

  test("star: CROWN == Spark SQL == DuckDB") {
    checkGraph(Queries.star3(100), Map("G" -> Seq("G1", "G2", "G3")),
      Map("G" -> edges))
  }

  test("2-comb: CROWN == Spark SQL == DuckDB") {
    checkGraph(Queries.comb2(100),
      Map("G" -> Seq("G1", "G2", "G3"), "V" -> Seq("V1", "V2")),
      Map("G" -> edges, "V" -> verts))
  }

  test("4-hop full with 10% filter: CROWN == Spark SQL == DuckDB") {
    val small = GraphData.edgesLocal(spark, nVertices = 200, nEdges = 800)
    checkGraph(Queries.hop4Full(100), Map("G" -> Seq("G1", "G2", "G3", "G4")),
      Map("G" -> small))
  }

  test("dumbbell proj via GHD bags: engine == Spark SQL == DuckDB") {
    val cq = Queries.dumbbellProj(1000)
    val copies = Map("G" -> (1 to 7).map(i => s"G$i").toSeq)
    val small = GraphData.edgesLocal(spark, nVertices = 60, nEdges = 500)
    val engine = new repro.ghd.BagEngine(cq.output)
    for (t <- small; atom <- copies("G"))
      engine.processUpdate(Upd(atom, t, isInsert = true))(_ => ())
    val crownDf = toDf(engine.fullSet.toSeq.map(_.toSeq), cq.output)
    val atomTables = cq.atoms.map(a => a.name ->
      toDf(small.map(_.toSeq), a.attrs.indices.map(i => s"c$i")))
    Oracle.assertEquivalent(crownDf, cq.referenceSql, atomTables: _*)
  }
}

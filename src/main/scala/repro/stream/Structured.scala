package repro.stream

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.core.{IncrementalEngine, Tup, Upd}

/** Spark Structured Streaming integration: the CROWN operator behind a real
  * micro-batched streaming query (`MemoryStream` source → `foreachBatch`
  * sink), the Spark analog of the paper's Flink DataStream deployment. The
  * engine holds its state on the driver across micro-batches — a stateful
  * streaming operator fed by Catalyst-planned batches.
  */
object Structured {

  /** Wire row for edge-table updates flowing through the stream. */
  final case class EdgeUpd(op: Int, src: Long, dst: Long, ts: Long) // op: 1 ins, 0 del

  final case class StreamStats(batches: Long, updates: Long, deltas: Long, millis: Double)

  /** Run a graph update sequence through Structured Streaming into `engine`.
    * `copies` expands each base edge update to the query's atom copies.
    */
  def runGraphStream(spark: SparkSession, engine: IncrementalEngine,
                     updates: Seq[Upd], copies: Seq[String],
                     batchSize: Int = 1000): StreamStats = {
    implicit val sqlCtx = spark.sqlContext
    import spark.implicits._
    val source = MemoryStream[EdgeUpd]
    var batches = 0L
    var processed = 0L
    var deltas = 0L
    val t0 = System.nanoTime()
    val query = source.toDS().writeStream
      .outputMode("append")
      .foreachBatch { (ds: org.apache.spark.sql.Dataset[EdgeUpd], _: Long) =>
        val rows = ds.collect()
        batches += 1
        for (e <- rows; atom <- copies) {
          processed += 1
          deltas += engine.processUpdate(
            Upd(atom, Tup(e.src, e.dst), e.op == 1, e.ts))(_ => ())
        }
      }
      .start()
    try {
      updates.grouped(batchSize).foreach { chunk =>
        source.addData(chunk.map(u =>
          EdgeUpd(if (u.isInsert) 1 else 0,
            u.t(0).asInstanceOf[Long], u.t(1).asInstanceOf[Long], u.ts)))
        query.processAllAvailable()
      }
    } finally query.stop()
    StreamStats(batches, processed, deltas, (System.nanoTime() - t0) / 1e6)
  }
}

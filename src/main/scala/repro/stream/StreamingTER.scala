package repro.stream

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.Trigger
import repro.cdd.Rule
import repro.core.{Params, Pivots}
import repro.impute.Repo
import repro.spark.{RecordRow, SparkTER}

/** Structured Streaming front-end for TER-iDS: arrivals flow through a
  * `MemoryStream[RecordRow]` source and each micro-batch is processed by
  * [[SparkTER]] inside `foreachBatch` — online imputation + stateful
  * window join per micro-batch (the repro target's
  * "Structured Streaming with stateful joins ... on micro-batches").
  *
  * `foreachBatch` + explicit state is the supported pattern here because
  * the paper's operator needs a count-based sliding window with
  * self-eviction and an unbounded-side join of the batch against that
  * window — neither is expressible with built-in stream-stream joins.
  */
final class StreamingTER(
    spark: SparkSession,
    d: Int,
    rules: Seq[Rule],
    repo: Repo,
    pivots: Pivots,
    vocab: Set[String],
    params: Params,
) {
  import spark.implicits._

  val ter = new SparkTER(spark, d, rules, repo, pivots, vocab, params)

  private implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
  val source: MemoryStream[RecordRow] = MemoryStream[RecordRow]

  private val query = source
    .toDS()
    .writeStream
    .outputMode("update")
    .trigger(Trigger.ProcessingTime(0))
    .foreachBatch { (ds: org.apache.spark.sql.Dataset[RecordRow], _: Long) =>
      val rows = ds.collect().sortBy(r => (r.ts, r.sid)).toSeq
      ter.processBatch(rows)
      ()
    }
    .start()

  /** Feed arrivals and block until the engine has consumed them. */
  def feed(rows: Seq[RecordRow]): Unit = {
    source.addData(rows)
    query.processAllAvailable()
  }

  def allMatches: Set[(Long, Long)] = ter.allMatches

  def stop(): Unit = query.stop()
}

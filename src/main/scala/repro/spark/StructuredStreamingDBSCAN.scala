package repro.spark

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.core.{EuclideanMetric, StreamingDBSCAN}

/** Structured Streaming driver for Algorithm 3.
  *
  * Pass 1 is genuinely streaming: a `writeStream.foreachBatch` sink feeds
  * each micro-batch (in arrival order) into the incremental net/summary
  * state of [[repro.core.StreamingDBSCAN]] held on the driver — the state is
  * the paper's E + M + per-ball counters, size O((Δ/ρε)^D + z), independent
  * of the stream length. Passes 2 and 3 re-scan the stream's archive (the
  * paper's algorithm is explicitly 3-pass), here any re-playable DataFrame
  * of the same rows.
  *
  * Rows are (id LONG, features ARRAY<DOUBLE>).
  */
final class StructuredStreamingDBSCAN(
    spark: SparkSession,
    eps: Double,
    minPts: Int,
    rho: Double
) {
  val engine = new StreamingDBSCAN[Array[Double]](EuclideanMetric, eps, minPts, rho)

  /** Run pass 1 over a streaming Dataset until it is exhausted. */
  def runPass1(stream: Dataset[(Long, Array[Double])], queryName: String = "dbscan-pass1"): Unit = {
    val query = stream.writeStream
      .queryName(queryName)
      .outputMode("append")
      .foreachBatch { (batch: Dataset[(Long, Array[Double])], _: Long) =>
        // foreachBatch runs on the driver; rows are ordered by id so replays
        // are deterministic (a stream source may deliver a batch unordered).
        val rows = batch.collect().sortBy(_._1).map(_._2)
        engine.observePass1(rows)
      }
      .start()
    query.processAllAvailable()
    query.stop()
    engine.finishPass1()
  }

  /** Passes 2+3 over the archived stream; returns (id, label) as a DataFrame. */
  def finish(archive: DataFrame): DataFrame = {
    import spark.implicits._
    val rows = archive
      .selectExpr("id", "features")
      .as[(Long, Array[Double])]
      .collect()
      .sortBy(_._1)
    rows.grouped(4096).foreach(chunk => engine.observePass2(chunk.iterator.map(_._2)))
    engine.mergeSummary()
    val labels = rows.iterator
      .grouped(4096)
      .flatMap { chunk =>
        engine.labelPass3(chunk.iterator.map(_._2)).zip(chunk.iterator.map(_._1)).map(_.swap)
      }
      .toSeq
    labels.toDF("id", "label")
  }
}

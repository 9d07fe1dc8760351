package repro.spark

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.streaming.{StreamingQuery, Trigger}
import repro.core.{Community, ReorderStats, Spade, Suspiciousness, Tx}

import scala.collection.mutable

/** Structured-Streaming front end for Spade: every micro-batch of
  * transactions is sorted by arrival time and folded into the driver-held
  * evolving-graph state with one Algorithm-2 batch reorder, then the updated
  * fraudulent community is re-detected — the paper's Fig. 4 workflow with
  * Spark micro-batches playing the role of the update stream `ΔG^τ`.
  *
  * The graph state is driver-side on purpose: the peeling-sequence merge is
  * a sequential priority-queue algorithm (that sequentiality is the paper's
  * contribution), while Spark owns ingestion, ordering and the surrounding
  * dataflow. `foreachBatch` gives exactly-once, in-order micro-batches on a
  * single stream, which is the consistency the evolving-graph model of §2.1
  * (ordered edge insertions) requires.
  */
final class StreamingSpade(metric: Suspiciousness, spotBeta: Double = 0.6) {

  val spade = new Spade(metric)

  /** One entry per processed micro-batch. */
  final case class BatchReport(batchId: Long, edges: Int, community: Community,
                               newlySpotted: Array[Int], stats: ReorderStats)

  private val reportsBuf = mutable.ArrayBuffer.empty[BatchReport]
  private val spotted = mutable.HashSet.empty[Int]

  /** Reports of all micro-batches processed so far (driver-side). */
  def reports: Seq[BatchReport] = reportsBuf.synchronized { reportsBuf.toVector }

  /** Vertices ever seen in a detected community. */
  def spottedVertices: Set[Int] = reportsBuf.synchronized { spotted.toSet }

  /** Bulk-load the initial graph before streaming starts. */
  def initialize(initial: Seq[Tx]): Community = spade.loadGraph(initial)

  /** Fold one already-collected micro-batch into the state. Exposed so the
    * offline replay and the streaming sink share one code path.
    */
  def processBatch(batchId: Long, txs: Array[Tx]): BatchReport = {
    val ordered = txs.sortBy(t => (t.ts, t.src, t.dst))
    val stats = spade.insertBatchEdges(ordered.toSeq)
    val community = spade.detect()
    val suspects = spade.detectSuspects(spotBeta)
    reportsBuf.synchronized {
      val fresh = suspects.members.filterNot(spotted.contains)
      fresh.foreach(spotted.add)
      val rep = BatchReport(batchId, ordered.length, community, fresh, stats)
      reportsBuf += rep
      rep
    }
  }

  /** Attach to a streaming DataFrame with columns
    * (src, dst, amount, ts, fraudId) and start the query. The caller owns
    * the query lifecycle (`processAllAvailable`, `stop`).
    */
  def start(stream: DataFrame, queryName: String = "spade-stream"): StreamingQuery = {
    stream
      .select(col("src").cast("int"), col("dst").cast("int"),
              col("amount").cast("double"), col("ts").cast("double"),
              col("fraudId").cast("int"))
      .writeStream
      .queryName(queryName)
      .trigger(Trigger.ProcessingTime(0L))
      .outputMode("append")
      .foreachBatch { (df: DataFrame, batchId: Long) =>
        val txs = df.collect().map { r: Row =>
          Tx(r.getInt(0), r.getInt(1), r.getDouble(2), r.getDouble(3), r.getInt(4))
        }
        if (txs.nonEmpty) { processBatch(batchId, txs); () }
      }
      .start()
  }
}

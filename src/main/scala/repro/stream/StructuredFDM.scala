package repro.stream

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.functions._
import repro.core.{Element, FdmResult, FdmState}

/** Structured Streaming execution of the streaming FDM algorithms — the
  * repro band's target: a streaming query whose `foreachBatch` sink folds
  * each micro-batch, in arrival order, into the bounded FDM state (the
  * per-guess candidates — O(km·logΔ/ε) elements, independent of the stream
  * length). Post-processing runs once at end-of-stream.
  *
  * The candidates are order-insensitive for the approximation guarantees
  * (Theorems 2 and 4 hold for any arrival order), but each batch is replayed
  * in `seq` order so a Structured Streaming run is bit-identical to the
  * sequential one-pass run on the same permutation — asserted in tests.
  */
object StructuredFDM {

  /** A stream row: `seq` is the arrival position that defines the logical
    * stream order across micro-batches.
    */
  final case class StreamRow(seq: Long, id: Long, group: Int, features: Array[Double])

  /** Feed `elements` (in order) through `state` as a MemoryStream-backed
    * streaming query with micro-batches of `batchSize`, then post-process.
    *
    * @return the FDM result plus the number of micro-batches executed
    */
  def run(
      spark: SparkSession,
      elements: Seq[Element],
      state: FdmState,
      batchSize: Int = 4096,
  ): (FdmResult, Long) = {
    import spark.implicits._
    val source = MemoryStream[StreamRow](spark)
    var batches = 0L
    val query = source
      .toDS()
      .writeStream
      .outputMode("append")
      .foreachBatch { (batch: Dataset[StreamRow], _: Long) =>
        // Micro-batch → state, in logical arrival order. The state lives on
        // the driver; only the tiny batch is collected.
        batch.orderBy(asc("seq")).collect().foreach(r => state.process(Element(r.id, r.group, r.features)))
        batches += 1
      }
      .start()
    try {
      elements.zipWithIndex
        .map { case (e, i) => StreamRow(i.toLong, e.id, e.group, e.features) }
        .grouped(batchSize)
        .foreach { chunk =>
          source.addData(chunk)
          query.processAllAvailable() // barrier per chunk → genuinely stateful across batches
        }
      query.processAllAvailable()
    } finally query.stop()
    (state.finish(), batches)
  }
}

package repro.core

import org.apache.spark.sql.{Dataset, Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator
import repro.stream.EdgeEvent

/** Distributed VOS build as a Spark typed [[Aggregator]] (Catalyst's
  * `TypedImperativeAggregate` path once planned).
  *
  * VOS is a natural distributed aggregation: the per-edge update is a
  * single XOR into the shared array plus a counter bump, the array state
  * merges by XOR and the counters by sum, and XOR/sum are associative and
  * commutative — so partial sketches built independently on each partition
  * combine into *exactly* the sketch a sequential pass produces
  * (order-independence is a property of the odd sketch, § IV: "the value
  * of A ... is irrelevant with the order of occurred users").
  *
  * Usage: `events.select(VOSAggregator.column(hashes)).head()`.
  *
  * @param hashes hash bundle fixing (k, m, seed); all partials must share it
  */
final class VOSAggregator(hashes: VOSHashes)
    extends Aggregator[EdgeEvent, VOSSketch, VOSSketch] {

  override def zero: VOSSketch = new VOSSketch(hashes)

  override def reduce(b: VOSSketch, e: EdgeEvent): VOSSketch = { b.update(e); b }

  override def merge(a: VOSSketch, b: VOSSketch): VOSSketch = a.merge(b)

  override def finish(reduction: VOSSketch): VOSSketch = reduction

  // The sketch is an opaque mutable structure → kryo-serialized buffer.
  override def bufferEncoder: Encoder[VOSSketch] = Encoders.kryo[VOSSketch]
  override def outputEncoder: Encoder[VOSSketch] = Encoders.kryo[VOSSketch]
}

object VOSAggregator {

  /** Column aggregating a `Dataset[EdgeEvent]` into one VOS sketch. */
  def column(hashes: VOSHashes): org.apache.spark.sql.TypedColumn[EdgeEvent, VOSSketch] =
    new VOSAggregator(hashes).toColumn

  /** Build the sketch of `events` distributed across the cluster and
    * return it to the driver.
    */
  def build(events: Dataset[EdgeEvent], hashes: VOSHashes): VOSSketch =
    events.select(column(hashes)).head()
}

package repro.spark

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, ObjectInputStream, ObjectOutputStream}

import org.apache.spark.sql.{Dataset, Encoder, Encoders}
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}

import repro.core.{JoinQuery, ReservoirJoinEngine}

/** One streamed tuple: global sequence number (defines the logical stream
  * order inside a micro-batch), relation name, attribute values.
  */
final case class TaggedTuple(seq: Long, rel: String, v: Seq[Long])

/** Reservoir snapshot emitted after each micro-batch. */
final case class SampleSnapshot(
    lastSeq: Long,
    tuplesSeen: Long,
    sampleSize: Int,
    rows: Seq[Map[String, Long]],
)

/** Structured Streaming integration (the distributed-dataflow mapping of the
  * paper): the RSJoin engine lives in the state store of a stateful operator
  * (`flatMapGroupsWithState`), absorbs each micro-batch's tuples in sequence
  * order, and emits a [[SampleSnapshot]] per trigger.
  *
  * Reservoir sampling over a join is inherently a sequential global fold —
  * the reservoir state after tuple i conditions the treatment of tuple i+1 —
  * so the operator is keyed by a single logical group; Spark provides the
  * micro-batching, exactly-once state management, and recovery. This is the
  * documented extension point for custom stateful streaming logic (DESIGN.md
  * "Layering").
  */
object StreamingReservoirJoin {

  def serialize(e: ReservoirJoinEngine): Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    val oos = new ObjectOutputStream(bos)
    oos.writeObject(e); oos.close()
    bos.toByteArray
  }

  def deserialize(b: Array[Byte]): ReservoirJoinEngine = {
    val ois = new ObjectInputStream(new ByteArrayInputStream(b))
    try ois.readObject().asInstanceOf[ReservoirJoinEngine] finally ois.close()
  }

  /** Attach the stateful sampling operator to a stream of tagged tuples.
    * Use with `OutputMode.Update` on the sink.
    */
  def attach(input: Dataset[TaggedTuple], query: JoinQuery, k: Int, seed: Long,
             grouping: Boolean = false): Dataset[SampleSnapshot] = {
    implicit val snapshotEnc: Encoder[SampleSnapshot] = Encoders.product[SampleSnapshot]
    implicit val stateEnc: Encoder[Array[Byte]] = Encoders.BINARY
    implicit val keyEnc: Encoder[Int] = Encoders.scalaInt

    input
      .groupByKey(_ => 0)
      .flatMapGroupsWithState[Array[Byte], SampleSnapshot](
        OutputMode.Update(), GroupStateTimeout.NoTimeout()) {
        (_: Int, tuples: Iterator[TaggedTuple], state: GroupState[Array[Byte]]) =>
          val engine = state.getOption
            .map(deserialize)
            .getOrElse(new ReservoirJoinEngine(query, k, seed, grouping))
          val ordered = tuples.toArray.sortBy(_.seq)
          var last = -1L
          ordered.foreach { t =>
            engine.insert(t.rel, t.v.toArray)
            last = t.seq
          }
          state.update(serialize(engine))
          val sample = engine.sample
          Iterator.single(SampleSnapshot(last, engine.inserts, sample.size, sample))
      }
  }
}

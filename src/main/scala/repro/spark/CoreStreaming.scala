package repro.spark

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, ObjectInputStream, ObjectOutputStream}
import org.apache.spark.sql.Dataset
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}
import repro.core.Ev
import repro.core.ceql.CeqlQuery
import repro.core.engine.{Engines, StreamEngine}

/** CORE as a Structured Streaming stateful operator.
  *
  * The PARTITION BY clause maps to the grouping key of
  * `flatMapGroupsWithState`; the per-key state is the *serialized engine* —
  * determinization cache, active-state table, and the reachable part of the
  * tECS — so partial matches survive across micro-batches and each event is
  * still processed once (the Algorithm-1 incremental guarantee carries over;
  * nothing is recomputed from a buffer).
  *
  * Events must arrive in `idx` order per key across micro-batches (CER streams
  * are ordered; within a batch we sort by idx).
  */
object CoreStreaming {

  def evaluate(events: Dataset[Ev], q: CeqlQuery, limit: Int = -1): Dataset[MatchRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    val keyFn: Ev => String =
      if (q.partitionBy.nonEmpty) Engines.partKeyFn(q.partitionBy) else (_: Ev) => ""
    val perGroup = q.copy(partitionBy = Nil)
    events
      .groupByKey(keyFn)
      .flatMapGroupsWithState[Array[Byte], MatchRow](OutputMode.Append, GroupStateTimeout.NoTimeout) {
        (key: String, it: Iterator[Ev], state: GroupState[Array[Byte]]) =>
          val engine: StreamEngine =
            state.getOption.map(deserialize).getOrElse(Engines.core(perGroup, limit))
          val out = it.toArray.sortBy(_.idx).iterator
            .flatMap(engine.onEvent)
            .map(ce => MatchRow(key, ce.start, ce.end, ce.data.mkString(",")))
            .toVector
          state.update(serialize(engine))
          out.iterator
      }
  }

  private[spark] def serialize(engine: StreamEngine): Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    val oos = new ObjectOutputStream(bos)
    oos.writeObject(engine); oos.close()
    bos.toByteArray
  }

  private[spark] def deserialize(bytes: Array[Byte]): StreamEngine = {
    val ois = new ObjectInputStream(new ByteArrayInputStream(bytes))
    try ois.readObject().asInstanceOf[StreamEngine] finally ois.close()
  }
}

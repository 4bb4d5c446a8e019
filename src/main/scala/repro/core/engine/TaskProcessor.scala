package repro.core.engine

import repro.core.model.{Event, FieldDef}
import repro.core.plan.{MetricResult, TaskPlan}
import repro.core.query.RailgunQuery
import repro.core.reservoir.{AppendOutcome, EventReservoir, ReservoirConfig, SchemaRegistry}
import repro.core.statestore.LsmStore
import repro.messaging.{Record, TopicPartition}

import java.io.{BufferedInputStream, BufferedOutputStream, DataInputStream, DataOutputStream, FileInputStream, FileOutputStream}
import java.nio.file.{Files, Path}

/** Computes *all* metrics of one (topic, partition) — Railgun's minimal unit
  * of work (§4.1). Owns a private event reservoir, a private state store and
  * the task plan; shares nothing with other task processors.
  */
final class TaskProcessor(val task: TopicPartition,
                          val dir: Path,
                          reservoirConfig: ReservoirConfig,
                          schema: Vector[FieldDef]) {
  Files.createDirectories(dir)

  private var registry = new SchemaRegistry
  registry.register(schema)
  private var reservoir = new EventReservoir(dir.resolve("reservoir"), reservoirConfig, registry)
  private var store = new LsmStore(dir.resolve("state"))

  private var queries: Vector[RailgunQuery] = Vector.empty
  private var plan: TaskPlan = new TaskPlan(Nil, reservoir, store)

  /** Offset of the last record applied to this task's state. */
  var lastOffset: Long = -1L
  var eventsProcessed: Long = 0L
  var duplicatesSeen: Long = 0L

  def currentQueries: Seq[RailgunQuery] = queries

  /** Registers a metric; its window is backfilled from the reservoir. */
  def addQuery(q: RailgunQuery): Unit = if (!queries.exists(_.name == q.name)) {
    queries :+= q
    plan.flushState() // the new plan's state cache starts cold
    plan = new TaskPlan(queries, reservoir, store, backfillFor = Set(q.name))
  }

  def removeQuery(name: String): Unit = {
    queries = queries.filterNot(_.name == name)
    plan.flushState()
    plan = new TaskPlan(queries, reservoir, store)
  }

  /** Applies one record: append to the reservoir (deduplicating), advance
    * the plan, and return the aggregation results for the event. Duplicate
    * deliveries (at-least-once replays) do not advance state — they answer
    * from current values, giving exactly-once *effects*.
    */
  def processRecord(rec: Record): Seq[MetricResult] = {
    val event = Codecs.eventFromBytes(rec.value)
    val outcome = reservoir.append(event)
    lastOffset = math.max(lastOffset, rec.offset)
    outcome match {
      case AppendOutcome.Duplicate =>
        duplicatesSeen += 1
        plan.currentValues(event)
      case AppendOutcome.DiscardedLate =>
        plan.currentValues(event)
      case AppendOutcome.RewrittenLate(newTs) =>
        eventsProcessed += 1
        plan.onEvent(event.copy(ts = newTs))
      case AppendOutcome.Accepted =>
        eventsProcessed += 1
        plan.onEvent(event)
    }
  }

  def iteratorCount: Int = plan.iteratorCount
  def prefixNodeCount: Int = plan.prefixNodeCount
  def reservoirRef: EventReservoir = reservoir
  def storeRef: LsmStore = store

  // ---- checkpoint / recovery ----------------------------------------------

  private def checkpointPath: Path = dir.resolve("checkpoint.bin")

  /** Synchronized checkpoint of reservoir + state store + offset (§4.1.3:
    * checkpoint triggers are synchronized among the two stores).
    */
  def checkpoint(): Long = {
    val out = new DataOutputStream(new BufferedOutputStream(
      new FileOutputStream(checkpointPath.toFile)))
    try {
      out.writeLong(lastOffset)
      out.writeLong(eventsProcessed)
      reservoir.checkpoint(out)
      plan.flushState() // cached aggregation states reach the durable store
      store.checkpoint(out)
    } finally out.close()
    lastOffset
  }

  def hasCheckpoint: Boolean = Files.exists(checkpointPath)

  /** Restores this processor's state from its directory's checkpoint (after
    * the directory has been populated locally or copied from a donor).
    * Returns the checkpointed offset; the caller rewinds the messaging layer
    * to offset+1 and replays.
    */
  def restoreFromCheckpoint(): Long = {
    require(hasCheckpoint, s"no checkpoint in $dir")
    reservoir.close()
    store.close()
    val in = new DataInputStream(new BufferedInputStream(
      new FileInputStream(checkpointPath.toFile)))
    try {
      lastOffset = in.readLong()
      eventsProcessed = in.readLong()
      reservoir = EventReservoir.restore(dir.resolve("reservoir"), reservoirConfig, in)
      registry = reservoir.registry
      store = LsmStore.restore(dir.resolve("state"), in)
      plan = new TaskPlan(queries, reservoir, store)
    } finally in.close()
    lastOffset
  }

  /** Copies this processor's latest checkpoint (data files + manifest) into
    * another task directory — the donor side of recovery (§4.2).
    */
  def copyCheckpointTo(destDir: Path): Unit = {
    checkpoint()
    Files.createDirectories(destDir)
    repro.core.reservoir.ChunkStore.copyFiles(dir.resolve("reservoir"), destDir.resolve("reservoir"))
    LsmStore.copyFiles(dir.resolve("state"), destDir.resolve("state"))
    Files.copy(checkpointPath, destDir.resolve("checkpoint.bin"),
      java.nio.file.StandardCopyOption.REPLACE_EXISTING)
  }

  def close(): Unit = {
    reservoir.close()
    store.close()
  }
}

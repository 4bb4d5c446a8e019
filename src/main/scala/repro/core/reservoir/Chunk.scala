package repro.core.reservoir

import repro.core.model.{Event, EventSchema, FieldType}

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}
import java.util.zip.{Deflater, DeflaterOutputStream, InflaterInputStream}

/** A closed, immutable group of events, sorted by (ts, id) — the unit of
  * reservoir I/O (§4.1.1). Chunks are serialized against a specific schema
  * version and compressed before hitting disk.
  */
final case class Chunk(chunkId: Long, schemaId: Int, events: Vector[Event]) {
  require(events.nonEmpty, s"chunk $chunkId is empty")
  def firstTs: Long = events.head.ts
  def lastTs: Long = events.last.ts
  def size: Int = events.size
}

/** Schema-driven binary codec + Deflate compression for chunks.
  *
  * Fields not covered by the schema are dropped on serialization — exactly
  * what a schema'd store does — so tests register schemas covering every
  * field they care about.
  */
object ChunkCodec {

  /** Total order used inside chunks and across the reservoir. */
  val eventOrdering: Ordering[Event] = Ordering.by(e => (e.ts, e.id))

  def serialize(chunk: Chunk, schema: EventSchema): Array[Byte] = {
    val bos = new ByteArrayOutputStream(chunk.size * 32)
    val out = new DataOutputStream(
      new DeflaterOutputStream(bos, new Deflater(Deflater.BEST_SPEED)))
    out.writeLong(chunk.chunkId)
    out.writeInt(chunk.schemaId)
    out.writeInt(chunk.events.size)
    chunk.events.foreach { e =>
      out.writeLong(e.id)
      out.writeLong(e.ts)
      schema.fields.foreach { f =>
        e.values.get(f.name) match {
          case None => out.writeBoolean(false)
          case Some(v) =>
            out.writeBoolean(true)
            f.ftype match {
              case FieldType.LongT   => out.writeLong(v match { case l: Long => l; case i: Int => i.toLong; case d: Double => d.toLong; case s: String => s.toLong })
              case FieldType.DoubleT => out.writeDouble(v match { case d: Double => d; case l: Long => l.toDouble; case i: Int => i.toDouble; case s: String => s.toDouble })
              case FieldType.StringT => out.writeUTF(v.toString)
            }
        }
      }
    }
    out.close()
    bos.toByteArray
  }

  def deserialize(bytes: Array[Byte], registry: SchemaRegistry): Chunk = {
    val in = new DataInputStream(new InflaterInputStream(new ByteArrayInputStream(bytes)))
    val chunkId = in.readLong()
    val schemaId = in.readInt()
    val schema = registry.get(schemaId)
    val n = in.readInt()
    val events = Vector.fill(n) {
      val id = in.readLong()
      val ts = in.readLong()
      val b = Map.newBuilder[String, Any]
      schema.fields.foreach { f =>
        if (in.readBoolean()) {
          val v: Any = f.ftype match {
            case FieldType.LongT   => in.readLong()
            case FieldType.DoubleT => in.readDouble()
            case FieldType.StringT => in.readUTF()
          }
          b += f.name -> v
        }
      }
      Event(id, ts, b.result())
    }
    in.close()
    Chunk(chunkId, schemaId, events)
  }
}

package repro.core.reservoir

import repro.core.model.{EventSchema, FieldDef, FieldType}

import java.io.{DataInputStream, DataOutputStream}
import scala.collection.mutable

/** Registry of event-schema versions (§4.1.1).
  *
  * Chunks are persisted tagged with the schema id they were serialized
  * under; when the stream's schema evolves, a new entry is registered and
  * becomes current, while old chunks remain readable through their
  * original schema.
  */
final class SchemaRegistry {
  private val schemas = mutable.ArrayBuffer.empty[EventSchema]

  /** Registers a new schema version and makes it current. Returns its id. */
  def register(fields: Vector[FieldDef]): Int = synchronized {
    val id = schemas.size
    schemas += EventSchema(id, fields)
    id
  }

  def currentId: Int = synchronized {
    require(schemas.nonEmpty, "no schema registered"); schemas.size - 1
  }

  def current: EventSchema = synchronized {
    require(schemas.nonEmpty, "no schema registered"); schemas.last
  }

  def get(id: Int): EventSchema = synchronized {
    require(id >= 0 && id < schemas.size, s"unknown schema id $id"); schemas(id)
  }

  def size: Int = synchronized(schemas.size)

  def write(out: DataOutputStream): Unit = synchronized {
    out.writeInt(schemas.size)
    schemas.foreach { s =>
      out.writeInt(s.fields.size)
      s.fields.foreach { f => out.writeUTF(f.name); out.writeByte(FieldType.code(f.ftype)) }
    }
  }
}

object SchemaRegistry {
  def read(in: DataInputStream): SchemaRegistry = {
    val r = new SchemaRegistry
    val n = in.readInt()
    (0 until n).foreach { _ =>
      val nf = in.readInt()
      val fields = Vector.fill(nf)(FieldDef(in.readUTF(), FieldType.fromCode(in.readByte())))
      r.register(fields)
    }
    r
  }
}

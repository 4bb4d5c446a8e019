package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.model.{Event, FieldDef, FieldType}
import repro.core.reservoir._

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}

class ReservoirSpec extends AnyFunSuite {

  private val fields = Vector(
    FieldDef("amount", FieldType.DoubleT),
    FieldDef("cardId", FieldType.StringT),
    FieldDef("n", FieldType.LongT))

  private def mkEvent(id: Long, ts: Long, amount: Double = 1.0): Event =
    Event(id, ts, Map("amount" -> amount, "cardId" -> s"c${id % 5}", "n" -> id))

  private def mkReservoir(cfg: ReservoirConfig = ReservoirConfig(chunkSizeEvents = 8, chunksPerFile = 4, cacheChunks = 4)): EventReservoir = {
    val reg = new SchemaRegistry
    reg.register(fields)
    new EventReservoir(TestKit.tempDir("res"), cfg, reg)
  }

  // ---- chunk codec ---------------------------------------------------------

  test("chunk codec round-trips events including missing fields (property)") {
    val reg = new SchemaRegistry
    val sid = reg.register(fields)
    val genEvent = for {
      id <- Gen.chooseNum(1L, 1000000L)
      ts <- Gen.chooseNum(0L, 10000L)
      amt <- Gen.chooseNum(-1000.0, 1000.0)
      omit <- Gen.oneOf(true, false)
    } yield Event(id, ts,
      if (omit) Map("cardId" -> s"c$id") else Map("amount" -> amt, "cardId" -> s"c$id", "n" -> id))
    TestKit.checkProp(Prop.forAll(Gen.nonEmptyListOf(genEvent)) { evs =>
      val distinct = evs.zipWithIndex.map { case (e, i) => e.copy(id = i.toLong) }
      val sorted = distinct.sorted(ChunkCodec.eventOrdering).toVector
      val chunk = Chunk(0L, sid, sorted)
      val back = ChunkCodec.deserialize(ChunkCodec.serialize(chunk, reg.get(sid)), reg)
      back == chunk
    }, minSuccessful = 40)
  }

  test("chunk codec drops fields absent from the schema (schema'd store)") {
    val reg = new SchemaRegistry
    val sid = reg.register(Vector(FieldDef("amount", FieldType.DoubleT)))
    val c = Chunk(0L, sid, Vector(Event(1, 1, Map("amount" -> 2.0, "ghost" -> "x"))))
    val back = ChunkCodec.deserialize(ChunkCodec.serialize(c, reg.get(sid)), reg)
    assert(back.events.head.values == Map("amount" -> 2.0))
  }

  test("compression shrinks repetitive chunks") {
    val reg = new SchemaRegistry
    val sid = reg.register(fields)
    val evs = Vector.tabulate(1000)(i => mkEvent(i.toLong, i.toLong, 7.0))
    val bytes = ChunkCodec.serialize(Chunk(0, sid, evs), reg.get(sid))
    assert(bytes.length < 1000 * 20, s"got ${bytes.length} bytes") // << raw footprint
  }

  // ---- schema registry -----------------------------------------------------

  test("schema registry versions schemas and round-trips its manifest") {
    val reg = new SchemaRegistry
    val id0 = reg.register(Vector(FieldDef("a", FieldType.LongT)))
    val id1 = reg.register(fields)
    assert(id0 == 0 && id1 == 1 && reg.currentId == 1)
    val bos = new ByteArrayOutputStream(); reg.write(new DataOutputStream(bos))
    val back = SchemaRegistry.read(new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
    assert(back.size == 2 && back.get(0).fields.head.name == "a"
      && back.get(1).fields == fields)
  }

  test("chunks written under an old schema stay readable after evolution") {
    val r = mkReservoir()
    (0 until 20).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 10)))
    r.flush()
    // evolve: add a field; old chunks reference schema id 0
    r.registry.register(fields :+ FieldDef("extra", FieldType.StringT))
    (20 until 40).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 10)))
    r.flush()
    val got = r.iterator().advanceTo(Long.MaxValue)
    assert(got.map(_.id) == (0L until 40L))
    r.close()
  }

  // ---- append / iterate -----------------------------------------------------

  for (chunkSize <- Seq(1, 2, 3, 8, 64)) {
    test(s"iterator returns all events in order across chunk/file boundaries (chunk=$chunkSize)") {
      val r = mkReservoir(ReservoirConfig(chunkSizeEvents = chunkSize, chunksPerFile = 3, cacheChunks = 4))
      val n = 100
      (0 until n).foreach(i => assert(r.append(mkEvent(i.toLong, i.toLong * 2)) == AppendOutcome.Accepted))
      val got = r.iterator().advanceTo(Long.MaxValue)
      assert(got.map(_.id) == (0L until n.toLong))
      assert(r.totalEvents == n)
      r.close()
    }
  }

  test("advanceTo is exclusive of the bound and never re-delivers") {
    val r = mkReservoir()
    (0 until 30).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 10)))
    val it = r.iterator()
    assert(it.advanceTo(100).map(_.id) == (0L until 10L)) // ts < 100
    assert(it.advanceTo(100).isEmpty)                     // nothing new
    assert(it.advanceTo(101).map(_.id) == Seq(10L))       // ts 100 now included
    assert(it.advanceTo(Long.MaxValue).map(_.id) == (11L until 30L))
    r.close()
  }

  test("iterator sees events still in the open (unpersisted) chunk") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 1000, chunksPerFile = 4, cacheChunks = 4))
    (0 until 5).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    assert(r.persistedChunks == 0)
    assert(r.iterator().advanceTo(Long.MaxValue).size == 5)
    r.close()
  }

  test("two iterators advance independently (head/tail of a window)") {
    val r = mkReservoir()
    (0 until 50).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    val head = r.iterator(); val tail = r.iterator()
    assert(head.advanceTo(50).size == 50)
    assert(tail.advanceTo(10).size == 10)
    assert(tail.advanceTo(50).size == 40)
    r.close()
  }

  test("iteratorFrom random-accesses by timestamp through the index") {
    val r = mkReservoir()
    (0 until 100).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 10)))
    r.flush()
    val it = r.iteratorFrom(333)
    val got = it.advanceTo(Long.MaxValue)
    assert(got.head.ts == 340 && got.map(_.id) == (34L until 100L))
    r.close()
  }

  test("iteratorFrom before all data returns everything") {
    val r = mkReservoir()
    (0 until 20).foreach(i => r.append(mkEvent(i.toLong, 1000 + i.toLong)))
    r.flush()
    assert(r.iteratorFrom(0).advanceTo(Long.MaxValue).size == 20)
    r.close()
  }

  test("peekTs exposes the next event's timestamp without consuming") {
    val r = mkReservoir()
    (0 until 10).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 5)))
    val it = r.iterator()
    assert(it.peekTs.contains(0L))
    it.advanceTo(6)
    assert(it.peekTs.contains(10L))
    r.close()
  }

  // ---- dedup / out-of-order --------------------------------------------------

  test("duplicate event ids are dropped against in-memory chunks") {
    val r = mkReservoir()
    assert(r.append(mkEvent(7, 100)) == AppendOutcome.Accepted)
    assert(r.append(mkEvent(7, 100)) == AppendOutcome.Duplicate)
    assert(r.append(mkEvent(7, 105)) == AppendOutcome.Duplicate) // same id, later ts
    assert(r.totalEvents == 1 && r.duplicates == 2)
    r.close()
  }

  test("Discard policy drops events older than the last closed chunk") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 4,
      cacheChunks = 4, latePolicy = LatePolicy.Discard))
    (0 until 12).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 100)))
    // chunks 0..2 closed; last finalized maxTs >= 700
    val out = r.append(mkEvent(99, 50))
    assert(out == AppendOutcome.DiscardedLate && r.lateDiscarded == 1)
    r.close()
  }

  test("Rewrite policy rewrites a too-late timestamp into the open head") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 4,
      cacheChunks = 4, latePolicy = LatePolicy.Rewrite))
    (0 until 12).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 100)))
    r.append(mkEvent(99, 50)) match {
      case AppendOutcome.RewrittenLate(newTs) => assert(newTs > 50)
      case other                              => fail(s"unexpected $other")
    }
    // the event is stored and iterable at its rewritten position
    val all = r.iterator().advanceTo(Long.MaxValue)
    assert(all.size == 13 && all.exists(_.id == 99))
    assert(all.map(_.ts) == all.map(_.ts).sorted)
    r.close()
  }

  test("out-of-order events within the open chunk are sorted at close") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 8, chunksPerFile = 4, cacheChunks = 4))
    Seq(5L, 3L, 8L, 1L, 7L, 2L, 6L, 4L).zipWithIndex.foreach { case (ts, i) =>
      assert(r.append(mkEvent(i.toLong, ts * 10)) == AppendOutcome.Accepted)
    }
    r.flush()
    val got = r.iterator().advanceTo(Long.MaxValue)
    assert(got.map(_.ts) == Seq(10L, 20L, 30L, 40L, 50L, 60L, 70L, 80L))
    r.close()
  }

  test("closeDelay keeps a full chunk accepting late events (transition state)") {
    val cfg = ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 4, cacheChunks = 4,
      closeDelayMs = 1000)
    val r = mkReservoir(cfg)
    (0 until 4).foreach(i => r.append(mkEvent(i.toLong, 100 + i.toLong))) // chunk fills at ts 103
    r.append(mkEvent(10, 200)) // next chunk; transition still open (200 < 103+1000)
    val late = r.append(mkEvent(11, 101)) // late, lands inside the transition chunk
    assert(late == AppendOutcome.Accepted)
    r.append(mkEvent(12, 2000)) // watermark passes -> transition finalizes
    r.flush()
    val got = r.iterator().advanceTo(Long.MaxValue)
    assert(got.map(_.ts) == got.map(_.ts).sorted)
    assert(got.count(_.id == 11) == 1)
    r.close()
  }

  test("without closeDelay, events older than a closed chunk are late") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 4, cacheChunks = 4))
    (0 until 4).foreach(i => r.append(mkEvent(i.toLong, 100 + i.toLong)))
    r.append(mkEvent(10, 200)) // closes chunk 0 for good (maxSeen advances)
    val out = r.append(mkEvent(11, 101))
    assert(out.isInstanceOf[AppendOutcome.RewrittenLate])
    r.close()
  }

  // ---- cache ----------------------------------------------------------------

  test("sequential scans hit the eager prefetch cache") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 16, chunksPerFile = 4, cacheChunks = 8))
    (0 until 400).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    r.flush()
    val it = r.iterator()
    var bound = 0L
    while (bound <= 400L) { it.advanceTo(bound); bound += 7 }
    r.cache.quiesce()
    val st = r.cacheStats
    assert(st.hits + st.misses > 0)
    r.close()
  }

  test("cache evicts LRU beyond capacity and counts stats") {
    val store = new SchemaRegistry
    store.register(fields)
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 2, cacheChunks = 2))
    (0 until 64).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    r.flush()
    // random access chunks to defeat the cache
    (0 until 10).foreach { k =>
      val it = r.iteratorFrom((k * 23) % 60)
      it.advanceTo((k * 23) % 60 + 3)
    }
    r.cache.quiesce()
    assert(r.cacheStats.evictions > 0)
    assert(r.cache.size <= 2)
    r.close()
  }

  // ---- durability -------------------------------------------------------------

  test("checkpoint + restore reproduces the exact event sequence") {
    val dir = TestKit.tempDir("res-ckpt")
    val reg = new SchemaRegistry; reg.register(fields)
    val cfg = ReservoirConfig(chunkSizeEvents = 8, chunksPerFile = 3, cacheChunks = 4)
    val r = new EventReservoir(dir, cfg, reg)
    (0 until 57).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 3)))
    val bos = new ByteArrayOutputStream()
    r.checkpoint(new DataOutputStream(bos))
    r.close()
    val restored = EventReservoir.restore(dir, cfg,
      new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
    assert(restored.totalEvents == 57)
    assert(restored.iterator().advanceTo(Long.MaxValue).map(_.id) == (0L until 57L))
    // appending continues after the checkpointed head
    restored.append(mkEvent(100, 1000))
    assert(restored.iterator().advanceTo(Long.MaxValue).size == 58)
    restored.close()
  }

  test("restored reservoir supports timestamp random access") {
    val dir = TestKit.tempDir("res-ckpt2")
    val reg = new SchemaRegistry; reg.register(fields)
    val cfg = ReservoirConfig(chunkSizeEvents = 4, chunksPerFile = 2, cacheChunks = 4)
    val r = new EventReservoir(dir, cfg, reg)
    (0 until 40).foreach(i => r.append(mkEvent(i.toLong, i.toLong * 10)))
    val bos = new ByteArrayOutputStream()
    r.checkpoint(new DataOutputStream(bos))
    r.close()
    val restored = EventReservoir.restore(dir, cfg,
      new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
    assert(restored.iteratorFrom(200).advanceTo(Long.MaxValue).map(_.ts).head == 200L)
    restored.close()
  }

  test("storage accounting: files roll over and bytes are compressed") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 10, chunksPerFile = 2, cacheChunks = 4))
    (0 until 100).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    r.flush()
    assert(r.persistedChunks == 10)
    assert(r.fileCount >= 5)
    assert(r.storedBytes > 0)
    r.close()
  }

  test("memory independence: only head/tail chunks are cached for a huge span") {
    val r = mkReservoir(ReservoirConfig(chunkSizeEvents = 32, chunksPerFile = 8, cacheChunks = 4))
    (0 until 3200).foreach(i => r.append(mkEvent(i.toLong, i.toLong)))
    r.flush()
    val tail = r.iterator()
    tail.advanceTo(5) // touches chunk 0 only
    r.cache.quiesce()
    assert(r.cache.size <= 4, s"cache holds ${r.cache.size} chunks") // not the 100 persisted
    r.close()
  }
}

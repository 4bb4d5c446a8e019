package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.agg.AggKind
import repro.core.model.Event
import repro.core.query.AggSpec
import repro.core.statestore.LsmStore

import scala.util.Random

/** The Flink-style baselines: hopping-window state behaviour and the
  * quadratic per-event rescan solution.
  */
class BaselineEnginesSpec extends AnyFunSuite {

  private def mkEvents(n: Int, seed: Long, keys: Int = 4, gap: Int = 40): Seq[Event] = {
    val rnd = new Random(seed)
    var ts = 0L
    (1 to n).map { i =>
      ts += 1 + rnd.nextInt(gap)
      Event(i.toLong, ts, Map("cardId" -> s"c${rnd.nextInt(keys)}",
        "amount" -> (rnd.nextInt(50) + 1).toDouble))
    }
  }

  private val sumCount = Seq(AggSpec(AggKind.Sum, Some("amount")), AggSpec(AggKind.Count, None))

  /** Brute-force hopping answer: events of the key in [earliest active
    * window start, ts].
    */
  private def bruteHopping(events: Seq[Event], upTo: Int, size: Long, hop: Long): Seq[Event] = {
    val e = events(upTo)
    val start = math.floorDiv(e.ts, hop) * hop - size + hop
    events.take(upTo + 1).filter(x =>
      x.str("cardId") == e.str("cardId") && x.ts >= start && x.ts <= e.ts)
  }

  for ((size, hop) <- Seq((400L, 100L), (600L, 200L), (300L, 300L))) {
    test(s"hopping engine (size=$size hop=$hop) matches the hopping-window definition") {
      val store = new LsmStore(TestKit.tempDir("hop"), memtableLimit = 256)
      val eng = new HoppingWindowEngine(store, size, hop, sumCount, "cardId")
      val events = mkEvents(250, seed = size + hop)
      events.zipWithIndex.foreach { case (e, i) =>
        val got = eng.onEvent(e)
        val w = bruteHopping(events, i, size, hop)
        assert(got.find(_.agg == "count(*)").get.value.contains(w.size.toLong), s"count @ $i")
        assert(TestKit.approxEq(got.find(_.agg == "sum(amount)").get.value,
          TestKit.sum(w, "amount")), s"sum @ $i")
      }
    }
  }

  test("hopping engine updates windowSize/hop states per event (the CPU cost)") {
    val store = new LsmStore(TestKit.tempDir("hop"), memtableLimit = 4096)
    val eng = new HoppingWindowEngine(store, 1000L, 100L, sumCount, "cardId")
    assert(eng.windowsPerEvent == 10)
    val events = mkEvents(50, seed = 1, keys = 1, gap = 5)
    events.foreach(eng.onEvent)
    // >= 10 windows x 2 aggs x 2 ops per event (plus expiry + answer reads)
    assert(eng.stateOps >= 50L * 10 * 2 * 2)
  }

  test("smaller hops mean proportionally more state operations") {
    def opsFor(hop: Long): Long = {
      val store = new LsmStore(TestKit.tempDir("hop"), memtableLimit = 8192)
      val eng = new HoppingWindowEngine(store, 1000L, hop, sumCount, "cardId")
      mkEvents(60, seed = 2, gap = 3).foreach(eng.onEvent)
      eng.stateOps
    }
    val coarse = opsFor(500L)
    val fine = opsFor(50L)
    assert(fine > coarse * 5, s"fine=$fine coarse=$coarse")
  }

  test("hopping engine expires dead window states (memory independence of throughput)") {
    val store = new LsmStore(TestKit.tempDir("hop"), memtableLimit = 8192)
    val eng = new HoppingWindowEngine(store, 200L, 100L, sumCount, "cardId")
    mkEvents(300, seed = 3, gap = 30).foreach(eng.onEvent)
    assert(eng.windowStatesExpired > 0)
  }

  test("hopping never over-counts relative to true sliding windows") {
    val store = new LsmStore(TestKit.tempDir("hop"), memtableLimit = 1024)
    val eng = new HoppingWindowEngine(store, 400L, 100L, sumCount, "cardId")
    val events = mkEvents(200, seed = 4)
    val sliding = TestKit.bruteSliding(events, 400L, _.str("cardId"))
    var sawUndercount = false
    events.zipWithIndex.foreach { case (e, i) =>
      val got = TestKit.anyNum(eng.onEvent(e).find(_.agg == "count(*)").get.value.get)
      assert(got <= sliding(i).size, s"over-count @ $i")
      if (got < sliding(i).size) sawUndercount = true
    }
    assert(sawUndercount, "hopping should differ from sliding somewhere")
  }

  test("per-event-scan engine is exact (matches brute-force sliding)") {
    val eng = new PerEventScanEngine(500L, sumCount, "cardId")
    val events = mkEvents(200, seed = 5)
    val sliding = TestKit.bruteSliding(events, 500L, _.str("cardId"))
    events.zipWithIndex.foreach { case (e, i) =>
      val got = eng.onEvent(e)
      assert(got.find(_.agg == "count(*)").get.value.contains(sliding(i).size.toLong), s"@ $i")
      assert(TestKit.approxEq(got.find(_.agg == "sum(amount)").get.value,
        TestKit.sum(sliding(i), "amount")), s"sum @ $i")
    }
  }

  test("per-event-scan engine work grows with window population (quadratic)") {
    def scanned(windowMs: Long): Long = {
      val eng = new PerEventScanEngine(windowMs, sumCount, "cardId")
      mkEvents(300, seed = 6, keys = 1, gap = 2).foreach(eng.onEvent)
      eng.eventsScanned
    }
    val small = scanned(20L)
    val large = scanned(100000L) // effectively unbounded: full quadratic
    assert(large > small * 10, s"large=$large small=$small")
  }

  test("per-event-scan engine expires events exactly like a sliding window") {
    val eng = new PerEventScanEngine(100L, sumCount, "cardId")
    eng.onEvent(Event(1, 1000, Map("cardId" -> "c", "amount" -> 1.0)))
    val r = eng.onEvent(Event(2, 1100, Map("cardId" -> "c", "amount" -> 1.0)))
    assert(r.find(_.agg == "count(*)").get.value.contains(1L)) // ts 1000 expired at 1100
  }
}

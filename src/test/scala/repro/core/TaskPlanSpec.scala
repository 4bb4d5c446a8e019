package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.model.{Event, FieldDef, FieldType}
import repro.core.plan.TaskPlan
import repro.core.query._
import repro.core.reservoir.{EventReservoir, ReservoirConfig, SchemaRegistry}
import repro.core.statestore.LsmStore

import scala.util.Random

/** Correctness of real-time sliding-window aggregation through the full
  * local stack (reservoir + plan DAG + state store) against a brute-force
  * oracle, plus the DAG/iterator-sharing structure the paper describes.
  */
class TaskPlanSpec extends AnyFunSuite {

  private val fields = Vector(
    FieldDef("amount", FieldType.DoubleT),
    FieldDef("cardId", FieldType.StringT),
    FieldDef("merchantId", FieldType.StringT))

  private def fixture(cfg: ReservoirConfig = ReservoirConfig(chunkSizeEvents = 8, chunksPerFile = 4, cacheChunks = 8)) = {
    val reg = new SchemaRegistry; reg.register(fields)
    val res = new EventReservoir(TestKit.tempDir("plan-res"), cfg, reg)
    val store = new LsmStore(TestKit.tempDir("plan-st"), memtableLimit = 64)
    (res, store)
  }

  private def randomEvents(n: Int, seed: Long, keys: Int = 4, tsStep: Int = 7): Seq[Event] = {
    val rnd = new Random(seed)
    var ts = 0L
    (1 to n).map { i =>
      ts += 1 + rnd.nextInt(tsStep)
      Event(i.toLong, ts, Map(
        "amount" -> (rnd.nextInt(100) + 1).toDouble,
        "cardId" -> s"c${rnd.nextInt(keys)}",
        "merchantId" -> s"m${rnd.nextInt(3)}"))
    }
  }

  private def q(sql: String, name: String): RailgunQuery = RailgunParser.parse(sql, name)

  private def run(queries: Seq[RailgunQuery], events: Seq[Event],
                  cfg: ReservoirConfig = ReservoirConfig(chunkSizeEvents = 8, chunksPerFile = 4, cacheChunks = 8)) = {
    val (res, store) = fixture(cfg)
    val plan = new TaskPlan(queries, res, store)
    val out = events.map { e => res.append(e); plan.onEvent(e) }
    (plan, out, res, store)
  }

  // ---- sliding window vs brute force, every aggregation ---------------------

  for ((aggSql, check) <- Seq[(String, (Seq[Event], String) => Option[Double])](
    "count(*)"      -> ((w, _) => Some(TestKit.count(w).toDouble)),
    "sum(amount)"   -> ((w, f) => TestKit.sum(w, f)),
    "avg(amount)"   -> ((w, f) => TestKit.avg(w, f)),
    "max(amount)"   -> ((w, f) => TestKit.mx(w, f)),
    "min(amount)"   -> ((w, f) => TestKit.mn(w, f)),
    "stdDev(amount)" -> ((w, f) => TestKit.stdDev(w, f)),
  )) {
    test(s"sliding $aggSql per card matches brute force on every event") {
      val events = randomEvents(300, seed = aggSql.##)
      val query = q(s"SELECT $aggSql FROM payments GROUP BY cardId OVER sliding 50 ms", "t")
      val (_, out, _, _) = run(Seq(query), events)
      val windows = TestKit.bruteSliding(events, 50, _.str("cardId"))
      events.indices.foreach { i =>
        val got = out(i).head.value
        val want = check(windows(i), "amount")
        assert(TestKit.approxEq(got, want), s"event $i: got $got want $want")
      }
    }
  }

  test("sliding countDistinct(merchantId) per card matches brute force") {
    val events = randomEvents(250, seed = 99)
    val query = q("SELECT countDistinct(merchantId) FROM payments GROUP BY cardId OVER sliding 40 ms", "cd")
    val (_, out, _, _) = run(Seq(query), events)
    val windows = TestKit.bruteSliding(events, 40, _.str("cardId"))
    events.indices.foreach { i =>
      val want = TestKit.countDistinct(windows(i), "merchantId")
      assert(out(i).head.value.contains(want), s"event $i")
    }
  }

  test("last/prev report the most recent window values") {
    val events = randomEvents(150, seed = 5, keys = 2)
    val query = q("SELECT last(amount), prev(amount) FROM payments GROUP BY cardId OVER sliding 60 ms", "lp")
    val (_, out, _, _) = run(Seq(query), events)
    val windows = TestKit.bruteSliding(events, 60, _.str("cardId"))
    events.indices.foreach { i =>
      val w = windows(i)
      val gotLast = out(i).find(_.agg == "last(amount)").get.value
      val gotPrev = out(i).find(_.agg == "prev(amount)").get.value
      assert(TestKit.approxEq(gotLast, w.lastOption.map(_.num("amount"))), s"last @ $i")
      assert(TestKit.approxEq(gotPrev,
        if (w.size < 2) None else Some(w(w.size - 2).num("amount"))), s"prev @ $i")
    }
  }

  test("the arriving event is always included in its own window (Figure 1 semantics)") {
    // five events spread over just under 5 "minutes" (scaled to ms)
    val events = Seq(30L, 90L, 150L, 210L, 299L).zipWithIndex.map { case (ts, i) =>
      Event(i + 1L, ts, Map("amount" -> 1.0, "cardId" -> "c1", "merchantId" -> "m"))
    }
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 300 ms", "fig1")
    val (_, out, _, _) = run(Seq(query), events)
    // the real-time sliding window counts all 5 events together on e5
    assert(out.last.head.value.contains(5L))
  }

  test("events exactly windowSize apart: the old event is excluded (t - w exclusive)") {
    val events = Seq(
      Event(1, 1000, Map("amount" -> 1.0, "cardId" -> "c", "merchantId" -> "m")),
      Event(2, 1100, Map("amount" -> 1.0, "cardId" -> "c", "merchantId" -> "m")))
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 100 ms", "excl")
    val (_, out, _, _) = run(Seq(query), events)
    assert(out(1).head.value.contains(1L)) // ts 1000 <= 1100 - 100 expired
  }

  test("WHERE filter applies to window contents, not only the arriving event") {
    val events = randomEvents(200, seed = 17)
    val query = q("SELECT count(*) FROM payments WHERE amount > 50 GROUP BY cardId OVER sliding 80 ms", "f")
    val (_, out, _, _) = run(Seq(query), events)
    val filter = JexlLite.parse("amount > 50")
    val windows = TestKit.bruteSliding(events, 80, _.str("cardId"), Some(filter))
    events.indices.foreach { i =>
      assert(out(i).head.value.contains(TestKit.count(windows(i))), s"event $i")
    }
  }

  test("multi-field GROUP BY aggregates per (card, merchant) entity") {
    val events = randomEvents(200, seed = 23)
    val query = q("SELECT sum(amount) FROM payments GROUP BY cardId, merchantId OVER sliding 70 ms", "mk")
    val (_, out, _, _) = run(Seq(query), events)
    val keyOf = (e: Event) => e.str("cardId") + "|" + e.str("merchantId")
    val windows = TestKit.bruteSliding(events, 70, keyOf)
    events.indices.foreach { i =>
      assert(TestKit.approxEq(out(i).head.value, TestKit.sum(windows(i), "amount")), s"event $i")
    }
  }

  // ---- other window types ----------------------------------------------------

  test("tumbling window resets at epoch-aligned boundaries") {
    val events = randomEvents(300, seed = 31, keys = 3)
    val query = q("SELECT count(*), sum(amount) FROM payments GROUP BY cardId OVER tumbling 100 ms", "tw")
    val (_, out, _, _) = run(Seq(query), events)
    val seen = collection.mutable.ArrayBuffer.empty[Event]
    events.zipWithIndex.foreach { case (e, i) =>
      seen += e
      val bucket = math.floorDiv(e.ts, 100)
      val w = seen.filter(x => x.str("cardId") == e.str("cardId") &&
        math.floorDiv(x.ts, 100) == bucket && x.ts <= e.ts)
      assert(out(i).find(_.agg == "count(*)").get.value.contains(w.size.toLong), s"event $i")
      assert(TestKit.approxEq(out(i).find(_.agg == "sum(amount)").get.value,
        Some(w.map(_.num("amount")).sum)), s"event $i sum")
    }
  }

  test("infinite window never expires events") {
    val events = randomEvents(250, seed = 41, keys = 2)
    val query = q("SELECT count(*), countDistinct(merchantId) FROM payments GROUP BY cardId OVER infinite", "inf")
    val (_, out, _, _) = run(Seq(query), events)
    val seen = collection.mutable.ArrayBuffer.empty[Event]
    events.zipWithIndex.foreach { case (e, i) =>
      seen += e
      val w = seen.filter(_.str("cardId") == e.str("cardId"))
      assert(out(i).find(_.agg == "count(*)").get.value.contains(w.size.toLong), s"event $i")
      assert(out(i).find(_.agg == "countDistinct(merchantId)").get.value
        .contains(w.map(_.str("merchantId")).distinct.size.toLong), s"event $i cd")
    }
  }

  test("delayed window lags the stream by its offset") {
    val events = (1 to 200).map(i =>
      Event(i.toLong, i.toLong * 10, Map("amount" -> 1.0, "cardId" -> "c", "merchantId" -> "m")))
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 300 ms delayed by 100 ms", "del")
    val (_, out, _, _) = run(Seq(query), events)
    events.zipWithIndex.foreach { case (e, i) =>
      // delayed window covers (t - 100 - 300, t - 100]
      val w = events.take(i + 1).filter(x => x.ts > e.ts - 400 && x.ts <= e.ts - 100)
      assert(out(i).head.value.contains(w.size.toLong), s"event $i")
    }
  }

  // ---- DAG and iterator sharing ------------------------------------------------

  test("queries sharing window+filter+groupBy share one prefix node (Figure 6)") {
    val q1 = q("SELECT sum(amount), count(*) FROM payments GROUP BY cardId OVER sliding 5 minutes", "q1")
    val q2 = q("SELECT avg(amount) FROM payments GROUP BY merchantId OVER sliding 5 minutes", "q2")
    val q3 = q("SELECT max(amount) FROM payments GROUP BY cardId OVER sliding 5 minutes", "q3")
    val (res, store) = fixture()
    val plan = new TaskPlan(Seq(q1, q2, q3), res, store)
    assert(plan.prefixNodeCount == 2) // (cardId) shared by q1+q3, (merchantId) for q2
  }

  test("aligned windows share iterators: 1-min and 5-min share the head") {
    val q1 = q("SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding 1 minute", "w1")
    val q2 = q("SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding 5 minutes", "w5")
    val (res, store) = fixture()
    val plan = new TaskPlan(Seq(q1, q2), res, store)
    // offsets: head 0 (shared), tails 60000 and 300000 -> 3 iterators, not 4
    assert(plan.iteratorCount == 3)
  }

  test("misaligned (delayed) windows need distinct iterators — Fig 9b setup") {
    // offsets chosen collision-free: heads 7i+1, tails 7i+1+13i = 20i+1
    val queries = (1 to 10).map { i =>
      q(s"SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding ${i * 13} ms delayed by ${i * 7 + 1} ms", s"w$i")
    }
    val (res, store) = fixture()
    val plan = new TaskPlan(queries, res, store)
    assert(plan.iteratorCount == 20) // 2 per window, none aligned
  }

  test("infinite windows only need a head iterator") {
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER infinite", "ih")
    val (res, store) = fixture()
    val plan = new TaskPlan(Seq(query), res, store)
    assert(plan.iteratorCount == 1)
  }

  test("multiple windows stay correct simultaneously (shared reservoir)") {
    val events = randomEvents(250, seed = 77)
    val qs = Seq(
      q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 30 ms", "a"),
      q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 90 ms", "b"),
      q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 240 ms", "c"))
    val (_, out, _, _) = run(qs, events)
    for ((name, w) <- Seq(("a", 30L), ("b", 90L), ("c", 240L))) {
      val windows = TestKit.bruteSliding(events, w, _.str("cardId"))
      events.indices.foreach { i =>
        val got = out(i).find(_.query == name).get.value
        assert(got.contains(TestKit.count(windows(i))), s"query $name event $i")
      }
    }
  }

  // ---- metric addition / backfill ----------------------------------------------

  test("adding a metric mid-stream backfills its window from the reservoir") {
    val events = randomEvents(200, seed = 55)
    val (res, store) = fixture()
    val q1 = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 100 ms", "old")
    var plan = new TaskPlan(Seq(q1), res, store)
    val (before, after) = events.splitAt(120)
    before.foreach { e => res.append(e); plan.onEvent(e) }
    // register a new metric; its window must contain the last 100ms of history
    val q2 = q("SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding 100 ms", "new")
    plan.flushState() // rebuild barrier, as TaskProcessor.addQuery does
    plan = new TaskPlan(Seq(q1, q2), res, store, backfillFor = Set("new"))
    val out = after.map { e => res.append(e); plan.onEvent(e) }
    val windows = TestKit.bruteSliding(events, 100, _.str("cardId"))
    after.indices.foreach { i =>
      val idx = 120 + i
      val gotNew = out(i).find(_.query == "new").get.value
      val gotOld = out(i).find(_.query == "old").get.value
      assert(TestKit.approxEq(gotNew, TestKit.sum(windows(idx), "amount")), s"new @ $idx")
      assert(gotOld.contains(TestKit.count(windows(idx))), s"old @ $idx")
    }
  }

  test("plan rebuild without backfill preserves existing query state") {
    val events = randomEvents(200, seed = 66)
    val (res, store) = fixture()
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 80 ms", "keep")
    var plan = new TaskPlan(Seq(query), res, store)
    val (a, b) = events.splitAt(100)
    a.foreach { e => res.append(e); plan.onEvent(e) }
    plan.flushState() // checkpoint barrier — recovery restores from the store
    plan = new TaskPlan(Seq(query), res, store) // e.g. after a recovery restore
    val out = b.map { e => res.append(e); plan.onEvent(e) }
    val windows = TestKit.bruteSliding(events, 80, _.str("cardId"))
    b.indices.foreach { i =>
      assert(out(i).head.value.contains(TestKit.count(windows(100 + i))), s"event ${100 + i}")
    }
  }

  test("plan advances windows for keys other than the arriving event's") {
    // an event for c2 must still expire c1's events
    val events = Seq(
      Event(1, 100, Map("amount" -> 1.0, "cardId" -> "c1", "merchantId" -> "m")),
      Event(2, 500, Map("amount" -> 1.0, "cardId" -> "c2", "merchantId" -> "m")),
      Event(3, 520, Map("amount" -> 1.0, "cardId" -> "c1", "merchantId" -> "m")))
    val query = q("SELECT count(*) FROM payments GROUP BY cardId OVER sliding 200 ms", "x")
    val (_, out, _, _) = run(Seq(query), events)
    assert(out(2).head.value.contains(1L)) // c1's first event long gone
  }
}

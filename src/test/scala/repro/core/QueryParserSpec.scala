package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.agg.AggKind
import repro.core.model.Event
import repro.core.query._

class QueryParserSpec extends AnyFunSuite {

  test("parses Q1 of Example 1 (sum + count per card over 5-min sliding)") {
    val q = RailgunParser.parse(
      "SELECT sum(amount), count(*) FROM payments GROUP BY cardId OVER sliding 5 minutes")
    assert(q.stream == "payments")
    assert(q.aggs == Seq(AggSpec(AggKind.Sum, Some("amount")), AggSpec(AggKind.Count, None)))
    assert(q.groupBy == Seq("cardId"))
    assert(q.window == SlidingWindow(5 * 60 * 1000L))
    assert(q.partitioner == "cardId")
  }

  test("parses Q2 of Example 1 (avg per merchant)") {
    val q = RailgunParser.parse(
      "SELECT avg(amount) FROM payments GROUP BY merchantId OVER sliding 5 minutes")
    assert(q.aggs == Seq(AggSpec(AggKind.Avg, Some("amount"))))
    assert(q.partitioner == "merchantId")
  }

  test("parses WHERE filters into JexlLite expressions") {
    val q = RailgunParser.parse(
      "SELECT count() FROM payments WHERE amount > 100 && country == 'PT' " +
        "GROUP BY cardId OVER sliding 1 hour")
    val e1 = Event(1, 0, Map("amount" -> 200.0, "country" -> "PT"))
    val e2 = Event(2, 0, Map("amount" -> 50.0, "country" -> "PT"))
    assert(JexlLite.matches(q.filter.get, e1))
    assert(!JexlLite.matches(q.filter.get, e2))
  }

  test("parses multi-field GROUP BY; first field is the partitioner") {
    val q = RailgunParser.parse(
      "SELECT sum(amount) FROM payments GROUP BY cardId, merchantId OVER sliding 10 minutes")
    assert(q.groupBy == Seq("cardId", "merchantId"))
    assert(q.partitioner == "cardId")
  }

  test("parses tumbling, infinite, and delayed windows") {
    assert(RailgunParser.parseWindow("tumbling 2 hours") == TumblingWindow(2 * 3600 * 1000L))
    assert(RailgunParser.parseWindow("infinite") == InfiniteWindow())
    assert(RailgunParser.parseWindow("sliding 5 minutes delayed by 30 seconds") ==
      SlidingWindow(5 * 60 * 1000L, 30 * 1000L))
    assert(RailgunParser.parseWindow("infinite delayed by 1 minute") == InfiniteWindow(60 * 1000L))
  }

  test("all nine aggregations parse") {
    val q = RailgunParser.parse(
      "SELECT count(*), sum(amount), avg(amount), stdDev(amount), max(amount), " +
        "min(amount), last(amount), prev(amount), countDistinct(merchantId) " +
        "FROM payments GROUP BY cardId OVER sliding 1 day")
    assert(q.aggs.map(_.kind) == AggKind.all)
  }

  for ((txt, ms) <- Seq(
      "500 ms" -> 500L, "10 s" -> 10000L, "10 seconds" -> 10000L,
      "5 minutes" -> 300000L, "1 min" -> 60000L, "2 hours" -> 7200000L,
      "1 h" -> 3600000L, "7 days" -> 604800000L, "1 d" -> 86400000L)) {
    test(s"duration '$txt' parses to $ms ms") {
      assert(RailgunParser.parseDuration(txt) == ms)
    }
  }

  test("hopping windows are (deliberately) not in the grammar") {
    intercept[IllegalArgumentException](RailgunParser.parseWindow("hopping 5 minutes"))
  }

  test("rejects unknown aggregations and missing GROUP BY") {
    intercept[IllegalArgumentException](RailgunParser.parse(
      "SELECT median(amount) FROM payments GROUP BY cardId OVER sliding 5 minutes"))
    intercept[IllegalArgumentException](RailgunParser.parse(
      "SELECT sum(amount) FROM payments OVER sliding 5 minutes"))
  }

  test("sliding window requires a positive size") {
    intercept[IllegalArgumentException](SlidingWindow(0))
  }

  // ---- JexlLite ------------------------------------------------------------

  private def ev(vals: (String, Any)*): Event = Event(1, 0, vals.toMap)

  for ((expr, event, expected) <- Seq(
      ("amount > 10", ev("amount" -> 20.0), true),
      ("amount > 10", ev("amount" -> 5.0), false),
      ("amount >= 10 && amount <= 30", ev("amount" -> 10.0), true),
      ("country == 'PT' || country == 'ES'", ev("country" -> "ES"), true),
      ("country != 'PT'", ev("country" -> "PT"), false),
      ("!(amount < 5)", ev("amount" -> 5.0), true),
      ("amount * 2 + 1 > 10", ev("amount" -> 5.0), true),
      ("(amount - 1) / 2 == 2", ev("amount" -> 5.0), true),
      ("missing == null", ev("amount" -> 1.0), true),
      ("true", ev(), true),
      ("false || amount == 3", ev("amount" -> 3L), true),
      ("-amount < 0", ev("amount" -> 2.0), true),
  )) {
    test(s"JexlLite: '$expr' on $event -> $expected") {
      assert(JexlLite.matches(JexlLite.parse(expr), event) == expected)
    }
  }

  test("JexlLite rejects malformed expressions") {
    intercept[Exception](JexlLite.parse("amount >"))
    intercept[Exception](JexlLite.parse("(amount > 1"))
    intercept[Exception](JexlLite.parse("amount > 1 extra ???"))
  }
}

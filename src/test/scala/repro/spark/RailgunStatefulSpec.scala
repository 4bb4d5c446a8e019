package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** The custom stateful operator (flatMapGroupsWithState) maintaining
  * accurate sliding windows on Structured Streaming — checked against the
  * Catalyst batch plan and the DuckDB oracle.
  */
class RailgunStatefulSpec extends SparkSpec {

  private def runStreaming(batches: Seq[Seq[Payment]], windowMs: Long): Seq[SlidingAnswer] = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val input = MemoryStream[Payment]
    val out = RailgunStateful.slidingAggregates(input.toDS(), windowMs)
    val name = s"railgun_out_${System.nanoTime()}"
    val query = out.writeStream.format("memory").queryName(name)
      .outputMode("append").start()
    try {
      batches.foreach { b => input.addData(b); query.processAllAvailable() }
      spark.table(name).as[SlidingAnswer].collect().toSeq.sortBy(_.eventId)
    } finally query.stop()
  }

  private def batchTruth(all: Seq[Payment], windowMs: Long): Map[Long, (Long, Double)] = {
    import spark.implicits._
    SlidingAggSpark.slidingAgg(all.toDF(), windowMs)
      .select("eventId", "cnt", "sum_amount")
      .collect().map(r => (r.getLong(0), (r.getLong(1), r.getDouble(2)))).toMap
  }

  for (nBatches <- Seq(1, 3, 5)) {
    test(s"streaming over $nBatches micro-batches equals the batch Catalyst plan") {
      val all = Payments.payments(180, ratePerSec = 100, nCards = 8, seed = 37)
      val batches = all.grouped(math.ceil(180.0 / nBatches).toInt).toSeq
      val got = runStreaming(batches, windowMs = 1500L)
      val want = batchTruth(all, 1500L)
      assert(got.size == 180)
      got.foreach { a =>
        val (cnt, sum) = want(a.eventId)
        assert(a.cnt == cnt, s"event ${a.eventId}: cnt ${a.cnt} != $cnt")
        assert(math.abs(a.sum - sum) < 1e-6, s"event ${a.eventId}: sum")
      }
    }
  }

  test("state persists across micro-batches (window spans batch boundaries)") {
    val all = Payments.payments(60, ratePerSec = 100, nCards = 1, seed = 41)
    // one event per batch: every answer depends on state from earlier batches
    val got = runStreaming(all.map(Seq(_)), windowMs = 100000L)
    got.zipWithIndex.foreach { case (a, i) =>
      assert(a.cnt == i + 1, s"event ${a.eventId} cnt ${a.cnt} != ${i + 1}")
    }
  }

  test("eviction works across batches: old events leave the reservoir") {
    val p1 = Payment(1, 1000L, "c", "m", 5.0)
    val p2 = Payment(2, 1500L, "c", "m", 7.0)
    val p3 = Payment(3, 5000L, "c", "m", 9.0) // 1 and 2 expired by now
    val got = runStreaming(Seq(Seq(p1, p2), Seq(p3)), windowMs = 2000L)
    assert(got.map(_.cnt) == Seq(1L, 2L, 1L))
    assert(got.last.sum == 9.0)
  }

  test("max/min over the streaming window match the batch plan") {
    import spark.implicits._
    val all = Payments.payments(120, ratePerSec = 100, nCards = 4, seed = 43)
    val got = runStreaming(all.grouped(40).toSeq, windowMs = 1200L)
    val want = SlidingAggSpark.slidingAgg(all.toDF(), 1200L)
      .select("eventId", "max_amount", "min_amount")
      .collect().map(r => (r.getLong(0), (r.getDouble(1), r.getDouble(2)))).toMap
    got.foreach { a =>
      val (mx, mn) = want(a.eventId)
      assert(math.abs(a.mx - mx) < 1e-9 && math.abs(a.mn - mn) < 1e-9, s"event ${a.eventId}")
    }
  }

  test("streaming results validate against the DuckDB oracle directly") {
    import spark.implicits._
    // integer amounts: exact double sums regardless of summation order
    val all = Payments.payments(100, ratePerSec = 100, nCards = 5, seed = 47)
      .map(p => p.copy(amount = math.rint(p.amount)))
    val got = runStreaming(Seq(all), windowMs = 900L)
    val gotDf = got.toDF()
      .select(col("eventId"), col("ts"), col("cardId"),
        col("cnt"), col("sum") as "sum_amount", col("avg") as "avg_amount",
        col("mx") as "max_amount", col("mn") as "min_amount")
    Oracle.assertEquivalent(gotDf, SlidingAggSpark.duckSql(900L),
      "payments" -> all.toDF().select("eventId", "ts", "cardId", "merchantId", "amount"))
  }

  test("batch-mode execution of the stateful operator works too") {
    import spark.implicits._
    val all = Payments.payments(80, ratePerSec = 100, nCards = 3, seed = 53)
    val got = RailgunStateful.slidingAggregates(all.toDS(), 800L)
      .collect().sortBy(_.eventId)
    val want = batchTruth(all, 800L)
    got.foreach(a => assert(a.cnt == want(a.eventId)._1, s"event ${a.eventId}"))
  }
}

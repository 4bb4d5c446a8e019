package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Catalyst sliding-window aggregation vs the DuckDB oracle. */
class SlidingAggSparkSpec extends SparkSpec {

  // integer-valued amounts keep double sums exact under any summation order,
  // so Spark and DuckDB agree bit-for-bit (the oracle compares at 1e-6)
  private def paymentsDf(n: Int, seed: Long = 11L) = {
    import spark.implicits._
    Payments.payments(n, ratePerSec = 100, nCards = 20, nMerchants = 5, seed = seed)
      .map(p => p.copy(amount = math.rint(p.amount)))
      .toDF()
  }

  for (windowMs <- Seq(50L, 500L, 5000L, 600000L)) {
    test(s"sliding aggregates over ${windowMs}ms window match DuckDB exactly") {
      val df = paymentsDf(400).cache()
      val got = SlidingAggSpark.slidingAgg(df, windowMs)
      Oracle.assertEquivalent(got, SlidingAggSpark.duckSql(windowMs),
        "payments" -> df.select("eventId", "ts", "cardId", "merchantId", "amount"))
    }
  }

  test("sliding aggregates keyed by merchant match DuckDB (Q2 of Example 1)") {
    val df = paymentsDf(300, seed = 7).cache()
    val got = SlidingAggSpark.slidingAgg(df, 1000L, keyCol = "merchantId")
    Oracle.assertEquivalent(got, SlidingAggSpark.duckSql(1000L, keyCol = "merchantId"),
      "payments" -> df.select("eventId", "ts", "cardId", "merchantId", "amount"))
  }

  test("window of 1ms degenerates to per-event (plus exact-ts peers)") {
    val df = paymentsDf(100, seed = 13).cache()
    val got = SlidingAggSpark.slidingAgg(df, 1L)
    Oracle.assertEquivalent(got, SlidingAggSpark.duckSql(1L),
      "payments" -> df.select("eventId", "ts", "cardId", "merchantId", "amount"))
  }

  test("every event is included in its own window (cnt >= 1 everywhere)") {
    val df = paymentsDf(200, seed = 17)
    val got = SlidingAggSpark.slidingAgg(df, 1000L)
    assert(got.filter(col("cnt") < 1).count() == 0)
  }

  test("row count is preserved: one answer per event") {
    val df = paymentsDf(250, seed = 19)
    assert(SlidingAggSpark.slidingAgg(df, 777L).count() == 250)
  }
}

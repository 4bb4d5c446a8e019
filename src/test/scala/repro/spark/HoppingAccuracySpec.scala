package repro.spark

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Quantifies the accuracy loss of hopping windows vs real-time sliding
  * windows (§2.1, Figure 1) — the A of MAD.
  */
class HoppingAccuracySpec extends SparkSpec {

  private def paymentsDf(n: Int, seed: Long = 23L) = {
    import spark.implicits._
    Payments.payments(n, ratePerSec = 100, nCards = 10, nMerchants = 5, seed = seed).toDF()
  }

  test("Figure 1: 5 events within the window; hopping (1-min hop) misses one") {
    import spark.implicits._
    // timestamps (minutes scaled to ms): e1..e5 all within a 5-min span, but
    // e1 arrives before the earliest active hopping window's start
    val df = Seq(
      Payment(1, 30000L, "c1", "m1", 1.0),   // 0.5 min
      Payment(2, 90000L, "c1", "m1", 1.0),   // 1.5 min
      Payment(3, 150000L, "c1", "m1", 1.0),  // 2.5 min
      Payment(4, 210000L, "c1", "m1", 1.0),  // 3.5 min
      Payment(5, 312000L, "c1", "m1", 1.0),  // 5.2 min — within 5 min of e1 (282 s apart)
    ).toDF()
    val size = 300000L; val hop = 60000L
    val sliding = SlidingAggSpark.slidingAgg(df, size)
      .filter($"eventId" === 5).select("cnt").as[Long].head()
    val hopping = HoppingAggSpark.hoppingAgg(df, size, hop)
      .filter($"eventId" === 5).select("cnt").as[Long].head()
    assert(sliding == 5L, "the real-time sliding window sees all 5 events")
    assert(hopping == 4L, "no physical hopping window contains all 5 events")
  }

  test("the business rule 'count > 4 in 5 min blocks' fires on sliding, not hopping") {
    import spark.implicits._
    val df = Seq(
      Payment(1, 30000L, "c1", "m1", 1.0), Payment(2, 90000L, "c1", "m1", 1.0),
      Payment(3, 150000L, "c1", "m1", 1.0), Payment(4, 210000L, "c1", "m1", 1.0),
      Payment(5, 312000L, "c1", "m1", 1.0)).toDF()
    val slide = SlidingAggSpark.slidingAgg(df, 300000L).filter($"cnt" > 4).count()
    val hop = HoppingAggSpark.hoppingAgg(df, 300000L, 60000L).filter($"cnt" > 4).count()
    assert(slide == 1 && hop == 0)
  }

  for (hopMs <- Seq(1000L, 500L, 100L)) {
    test(s"hop=${hopMs}ms: error rate vs sliding shrinks with the hop, never 0") {
      // 600 events at 100 ev/s span ~6 s; a 2 s window keeps the hop material
      val df = paymentsDf(600).cache()
      val size = 2000L
      val s = SlidingAggSpark.slidingAgg(df, size).select(col("eventId"), col("cnt") as "s_cnt")
      val h = HoppingAggSpark.hoppingAgg(df, size, hopMs).select(col("eventId"), col("cnt") as "h_cnt")
      val joined = s.join(h, "eventId").cache()
      val total = joined.count()
      val wrong = joined.filter(col("s_cnt") =!= col("h_cnt")).count()
      assert(total == 600)
      assert(wrong > 0, "hopping windows are never exactly sliding windows")
      // hopping under-counts: it can only miss history, never invent it
      assert(joined.filter(col("h_cnt") > col("s_cnt")).count() == 0)
      val errorRate = wrong.toDouble / total
      info(f"hop=${hopMs}ms error rate: $errorRate%.3f")
    }
  }

  test("error rate decreases monotonically as the hop shrinks") {
    val df = paymentsDf(600, seed = 29).cache()
    val size = 2000L
    val s = SlidingAggSpark.slidingAgg(df, size).select(col("eventId"), col("cnt") as "s_cnt")
    val rates = Seq(1000L, 200L, 40L).map { hop =>
      val h = HoppingAggSpark.hoppingAgg(df, size, hop).select(col("eventId"), col("cnt") as "h_cnt")
      val j = s.join(h, "eventId")
      j.filter(col("s_cnt") =!= col("h_cnt")).count().toDouble / j.count()
    }
    assert(rates == rates.sorted.reverse, s"rates not decreasing: $rates")
  }

  test("tumbling (hop == size) is the coarsest approximation") {
    val df = paymentsDf(400, seed = 31).cache()
    val size = 1000L
    val s = SlidingAggSpark.slidingAgg(df, size).select(col("eventId"), col("cnt") as "s_cnt")
    val tumble = HoppingAggSpark.hoppingAgg(df, size, size)
      .select(col("eventId"), col("cnt") as "h_cnt")
    val small = HoppingAggSpark.hoppingAgg(df, size, size / 10)
      .select(col("eventId"), col("cnt") as "h_cnt")
    def err(h: org.apache.spark.sql.DataFrame): Double = {
      val j = s.join(h, "eventId")
      j.filter(col("s_cnt") =!= col("h_cnt")).count().toDouble / j.count()
    }
    assert(err(tumble) > err(small))
  }
}

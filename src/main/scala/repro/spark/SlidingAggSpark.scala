package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Per-event *accurate* sliding-window aggregates as a Catalyst plan —
  * the batch-mode expression of Railgun's semantics (§2): an event with
  * timestamp t aggregates over all same-key events in (t - w, t].
  *
  * Implemented with Catalyst window frames
  * (`RANGE BETWEEN w-1 PRECEDING AND CURRENT ROW` over event-time ms), so it
  * is oracle-checkable against DuckDB and serves as ground truth for both
  * the streaming operator and the accuracy experiments.
  */
object SlidingAggSpark {

  /** Input columns: eventId, ts (epoch ms), cardId, amount.
    * Output: input + cnt, sum_amount, avg_amount, max_amount, min_amount.
    */
  def slidingAgg(events: DataFrame, windowMs: Long, keyCol: String = "cardId"): DataFrame = {
    require(windowMs > 0, "window must be positive")
    val w = Window.partitionBy(col(keyCol)).orderBy(col("ts"))
      .rangeBetween(-(windowMs - 1), Window.currentRow)
    events.select(
      col("eventId"), col("ts"), col(keyCol),
      count(lit(1)).over(w)  as "cnt",
      sum("amount").over(w)  as "sum_amount",
      avg("amount").over(w)  as "avg_amount",
      max("amount").over(w)  as "max_amount",
      min("amount").over(w)  as "min_amount",
    )
  }

  /** DuckDB statement computing the same result over a `payments` table with
    * VARCHAR columns (the Oracle loads everything as VARCHAR).
    */
  def duckSql(windowMs: Long, keyCol: String = "cardId"): String =
    s"""
       |SELECT
       |  CAST(eventId AS BIGINT)                       AS eventId,
       |  CAST(ts AS BIGINT)                            AS ts,
       |  $keyCol                                       AS $keyCol,
       |  COUNT(*) OVER w                               AS cnt,
       |  SUM(CAST(amount AS DOUBLE)) OVER w            AS sum_amount,
       |  AVG(CAST(amount AS DOUBLE)) OVER w            AS avg_amount,
       |  MAX(CAST(amount AS DOUBLE)) OVER w            AS max_amount,
       |  MIN(CAST(amount AS DOUBLE)) OVER w            AS min_amount
       |FROM payments
       |WINDOW w AS (PARTITION BY $keyCol ORDER BY CAST(ts AS BIGINT)
       |             RANGE BETWEEN ${windowMs - 1} PRECEDING AND CURRENT ROW)
       |""".stripMargin
}

/** Hopping-window approximation of sliding aggregates in DataFrame land —
  * what Flink/Spark's built-in `window()` semantics give a per-event
  * consumer (§2.2): the answer for an event at time t is read from the
  * earliest *active* physical window, which starts at
  * floor(t/hop)·hop − size + hop and so misses up to (hop − ε) of history
  * (Figure 1).
  */
object HoppingAggSpark {

  /** Per-event hopping answers; same output shape as
    * [[SlidingAggSpark.slidingAgg]] minus max/min (kept comparable with the
    * engine baseline).
    */
  def hoppingAgg(events: DataFrame, windowMs: Long, hopMs: Long,
                 keyCol: String = "cardId"): DataFrame = {
    require(windowMs % hopMs == 0, "hop must divide window size")
    val e = events.select(
      col("eventId"), col("ts"), col(keyCol), col("amount"),
      (floor(col("ts") / hopMs) * hopMs - windowMs + hopMs) as "wstart")
    val x = events.select(
      col(keyCol) as "x_key", col("ts") as "x_ts", col("amount") as "x_amount")
    e.join(x, e(keyCol) === x("x_key") && x("x_ts") >= e("wstart") && x("x_ts") <= e("ts"))
      .groupBy(e("eventId"), e("ts"), e(keyCol))
      .agg(
        count(lit(1))   as "cnt",
        sum("x_amount") as "sum_amount",
        avg("x_amount") as "avg_amount",
      )
  }
}

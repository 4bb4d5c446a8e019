package repro.bench

import repro.SparkSpec
import repro.harness.Accuracy

/** Table for the §2.1/Figure 1 accuracy claim (the A of MAD), on Spark:
  * per-event error rate of hopping windows vs true sliding windows, and the
  * missed fires of the business rule "block when the window count exceeds
  * the threshold".
  *
  * Paper's claim: hopping windows are inaccurate event-by-event regardless
  * of hop size (only the error magnitude shrinks), and compliance rules
  * evaluated on them miss triggers a real-time sliding window catches.
  */
class AccuracyBench extends SparkSpec {

  private lazy val rows: Seq[Accuracy.Row] = {
    val r = Accuracy.run(spark)
    println("\n== Accuracy - hopping vs real-time sliding windows (Spark/Catalyst) ==")
    r.foreach(x => println(x.render))
    r
  }

  test("hopping windows are never exactly accurate, at any hop") {
    rows.foreach(r => assert(r.errorRate > 0, s"${r.hopLabel} error rate 0"))
  }

  test("error rate shrinks as the hop shrinks, but never reaches 0") {
    val rates = rows.map(_.errorRate)
    assert(rates == rates.sorted.reverse, s"rates not decreasing: $rates")
    assert(rates.last > 0)
  }

  test("the blocking rule misses fires on hopping windows") {
    rows.foreach { r =>
      assert(r.ruleFiresHopping <= r.ruleFiresSliding, r.hopLabel)
    }
    assert(rows.exists(r => r.ruleFiresHopping < r.ruleFiresSliding),
      "no missed rule fires anywhere — hop too fine for the workload")
  }

  test("the sliding window fires the rule (the workload is adversarial enough)") {
    assert(rows.head.ruleFiresSliding > 0)
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Fig8, Harness}

/** Table for Figure 8: Flink hopping windows (hop 5 min → 1 s) vs Railgun's
  * real-time sliding window; sum(amount) per card over a 60-min window at a
  * sustained 500 ev/s.
  *
  * Paper's reported shape (read off Fig. 8):
  *   - hop >= 1 min: sustainable, p99.9 < 250 ms;
  *   - hop <= 10 s: Flink cannot keep up with 500 ev/s (latencies diverge);
  *   - Railgun: lowest service cost of all configs, p99.9 < 250 ms,
  *     independent of the 60-min window;
  *   - the custom per-event rescan [21] is far worse than standard hopping.
  */
class Fig8FlinkVsRailgunBench extends AnyFunSuite {

  private lazy val rows: Seq[Harness.Row] = {
    val r = Fig8.run()
    println(Harness.header(
      "Figure 8 - Flink hopping vs Railgun sliding, 500 ev/s, 60-min window"))
    r.foreach(x => println(x.render))
    r
  }

  private def row(label: String): Harness.Row =
    rows.find(_.label.startsWith(label)).getOrElse(fail(s"missing row $label"))

  test("hop=5min and hop=1min sustain 500 ev/s with p99.9 < 250 ms") {
    Seq("flink hop=5min", "flink hop=1min").foreach { l =>
      val r = row(l)
      assert(!r.saturated, s"$l saturated")
      assert(r.p(99.9) < 250, s"$l p99.9=${r.p(99.9)}")
    }
  }

  test("small hops degrade sharply; hop=1s cannot keep up (paper: hop<=10s)") {
    assert(row("flink hop=1s").saturated || row("flink hop=1s").p(50) > 1000)
    assert(row("flink hop=5s").p(99.9) > row("flink hop=1min").p(99.9) * 5)
  }

  test("per-event cost grows with windowSize/hop (the hopping CPU story)") {
    val byHop = Seq("flink hop=5min", "flink hop=1min", "flink hop=30s",
      "flink hop=10s", "flink hop=5s", "flink hop=1s").map(l => row(l).meanServiceMs)
    assert(byHop == byHop.sorted, s"service not monotone in 1/hop: $byHop")
    assert(byHop.last > byHop.head * 50)
  }

  test("Railgun meets M: p99.9 < 250 ms with accurate per-event answers") {
    val r = row("railgun sliding 60min")
    assert(!r.saturated)
    assert(r.p(99.9) < 250, s"railgun p99.9=${r.p(99.9)}")
  }

  test("Railgun's service cost beats every Flink configuration") {
    val railgun = row("railgun sliding 60min").meanServiceMs
    Fig8.Hops.foreach { case (label, _) =>
      assert(railgun < row(label).meanServiceMs, s"railgun not cheaper than $label")
    }
  }

  test("Railgun latency <= Flink at every percentile for hop <= 1min (paper claim)") {
    val railgun = row("railgun sliding 60min")
    Seq("flink hop=1min", "flink hop=30s", "flink hop=10s", "flink hop=5s", "flink hop=1s")
      .foreach { l =>
        Harness.Percents.foreach { q =>
          assert(railgun.p(q) <= row(l).p(q) * 1.02, // 2% sim noise allowance
            s"railgun p$q=${railgun.p(q)} vs $l=${row(l).p(q)}")
        }
      }
  }

  test("the custom Flink rescan [21] is much worse than standard hopping") {
    val rescan = row("flink custom rescan [21]")
    assert(rescan.meanServiceMs > row("flink hop=1min").meanServiceMs * 5)
    // at (or past) the server's capacity — the paper's "much worse
    // performance than Flink's standard hopping windows, failing M"
    assert(rescan.saturated || rescan.utilization > 0.9,
      s"rescan util=${rescan.utilization}")
  }
}

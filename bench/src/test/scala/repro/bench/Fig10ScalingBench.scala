package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Fig10

/** Table for Figure 10: average throughput per node while scaling from
  * 1 node / 25 k ev/s to 50 nodes / 1 M ev/s (8 processor units per node;
  * sum+avg+count of amount per card over a 5-min window).
  *
  * Paper's reported shape: near-linear scaling; small degradation starting
  * around 35 nodes / 750 k ev/s (Kafka partition count); 1 M ev/s reached
  * at 50 nodes ≈ 20 k ev/s per node on average; M (p99.9 < 250 ms) holds
  * throughout.
  */
class Fig10ScalingBench extends AnyFunSuite {

  private lazy val rows: Seq[Fig10.ScaleRow] = {
    val r = Fig10.run()
    println("\n== Figure 10 - Railgun node scaling, 25k -> 1M ev/s ==")
    r.foreach(x => println(x.render))
    r
  }

  private def at(nodes: Int): Fig10.ScaleRow =
    rows.find(_.nodes == nodes).getOrElse(fail(s"missing $nodes-node row"))

  test("every operating point sustains its target throughput (>= 97%)") {
    rows.foreach { r =>
      assert(r.result.achievedRatePerSec >= r.targetRate * 0.97,
        s"${r.nodes} nodes achieved ${r.result.achievedRatePerSec} of ${r.targetRate}")
    }
  }

  test("M holds at scale: p99.9 < 250 ms at every operating point") {
    rows.foreach(r => assert(r.result.p999 < 250,
      s"${r.nodes} nodes p99.9=${r.result.p999}"))
  }

  test("near-linear region: 1-20 nodes hold ~25k ev/s per node") {
    Seq(1, 5, 10, 20).foreach { n =>
      assert(at(n).result.avgPerNodeRate >= 24000, s"$n nodes per-node rate")
    }
  }

  test("1M ev/s reached at 50 nodes at ~20k ev/s per node (paper's endpoint)") {
    val r = at(50)
    assert(r.result.achievedRatePerSec >= 970000)
    assert(r.result.avgPerNodeRate >= 18000 && r.result.avgPerNodeRate <= 25000)
  }

  test("the partition-count tax is visible in the tail beyond ~280 partitions") {
    // 50 nodes x 8 units = 400 partitions (past the knee) vs 10 nodes = 80
    assert(at(50).result.p999 >= at(10).result.p999 * 0.95)
  }
}

package repro.sim

import org.scalatest.funsuite.AnyFunSuite

/** The latency/scaling simulation substrate: queueing behaviour, percentile
  * math, and the calibrated cluster model.
  */
class SimSpec extends AnyFunSuite {

  test("percentiles: nearest-rank on a known distribution") {
    val xs = (1 to 100).map(_.toDouble).toArray
    assert(Percentiles.of(xs, 50) == 50.0)
    assert(Percentiles.of(xs, 99) == 99.0)
    assert(Percentiles.of(xs, 99.9) == 100.0)
    assert(Percentiles.of(xs, 1) == 1.0)
  }

  test("percentile table is monotonically non-decreasing") {
    val rnd = new scala.util.Random(1)
    val xs = Array.fill(5000)(rnd.nextDouble() * 100)
    val t = Percentiles.table(xs).map(_._2)
    assert(t == t.sorted)
  }

  test("an unloaded server's latency is dominated by the messaging RTT") {
    val res = QueueSim.run(ratePerSec = 10, nEvents = 5000,
      serviceTimesMs = Array(0.01), seed = 1)
    assert(res.utilization < 0.01)
    assert(res.p(50) > 5 && res.p(50) < 40, s"median ${res.p(50)}")
    assert(!res.saturated)
  }

  test("service time above the inter-arrival gap makes latency explode (CO-corrected)") {
    // 500 ev/s -> 2ms budget; 5ms service must diverge, visibly at the median
    val res = QueueSim.run(ratePerSec = 500, nEvents = 20000,
      serviceTimesMs = Array(5.0), seed = 2)
    assert(res.utilization >= 0.999)
    assert(res.p(50) > 1000, s"median ${res.p(50)} should show the growing backlog")
    assert(res.saturated || res.p(99.9) > 10000)
  }

  test("below saturation, higher load only inflates the tail") {
    val light = QueueSim.run(500, 20000, Array(0.2, 0.3, 0.25), seed = 3)
    val heavy = QueueSim.run(500, 20000, Array(1.2, 1.5, 1.0), seed = 3)
    assert(!light.saturated && !heavy.saturated)
    assert(heavy.p(99.9) >= light.p(99.9))
    assert(heavy.p(50) < 100) // still sane at the median
  }

  test("deterministic: same seed, same percentiles") {
    val a = QueueSim.run(100, 5000, Array(0.5), seed = 9)
    val b = QueueSim.run(100, 5000, Array(0.5), seed = 9)
    assert(a.latenciesMs.toSeq == b.latenciesMs.toSeq)
  }

  test("RTT spikes shape the far tail, not the median") {
    val noSpike = QueueSim.RttModel(spikeProb = 0.0)
    val spiky = QueueSim.RttModel(spikeProb = 0.01, spikeMs = 500)
    val a = QueueSim.run(100, 30000, Array(0.1), rtt = noSpike, seed = 4)
    val b = QueueSim.run(100, 30000, Array(0.1), rtt = spiky, seed = 4)
    assert(math.abs(a.p(50) - b.p(50)) < 10)
    assert(b.p(99.9) > a.p(99.9) + 100)
  }

  test("partition shares reflect key skew and sum to 1") {
    val keys = repro.spark.Payments.events(20000, nCards = 1000)
      .map(_.str("cardId")).toSeq
    val shares = ClusterSim.partitionShares(keys, 16)
    assert(math.abs(shares.sum - 1.0) < 1e-9)
    assert(shares.max > shares.min, "zipf keys should imbalance partitions")
  }

  test("cluster sim: one node at its rated load meets the M requirement") {
    val svc = Array.fill(256)(0.05)
    val r = ClusterSim.run(nodes = 1, unitsPerNode = 8, targetRatePerSec = 25000,
      serviceTimesMs = svc, keySample = sampleKeys(), eventsPerUnit = 4000)
    assert(r.p999 < 250, s"p99.9 ${r.p999}")
    assert(r.achievedRatePerSec > 24000)
  }

  test("cluster sim: throughput per node degrades slightly at 50 nodes (Kafka knee)") {
    val svc = Array.fill(256)(0.05)
    val small = ClusterSim.run(10, 8, 250000, svc, sampleKeys(), eventsPerUnit = 2000)
    val big = ClusterSim.run(50, 8, 1250000, svc, sampleKeys(), eventsPerUnit = 2000)
    // same per-node target; the big cluster pays the partition-count tax
    assert(big.p999 >= small.p999)
  }

  private def sampleKeys(): Seq[String] =
    repro.spark.Payments.events(30000, nCards = 100000).map(_.str("cardId")).toSeq
}

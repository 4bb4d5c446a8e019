package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.engine.{RailgunCluster, StreamMeta}
import repro.core.model.Event
import repro.core.reservoir.ReservoirConfig
import repro.messaging.MiniKafka
import repro.spark.Payments

import scala.util.Random

/** End-to-end Railgun over the in-process substrate: Figure 3's full event
  * path, Example 1's queries, replication, failure recovery, and
  * exactly-once effects.
  */
class RailgunClusterSpec extends AnyFunSuite {

  private def mkCluster(nodes: Int = 2, unitsPerNode: Int = 2, rf: Int = 2): RailgunCluster = {
    val cluster = new RailgunCluster(new MiniKafka, TestKit.tempDir("railgun"),
      replicationFactor = rf,
      reservoirConfig = ReservoirConfig(chunkSizeEvents = 16, chunksPerFile = 4, cacheChunks = 8))
    (0 until nodes).foreach(i => cluster.addNode(s"node$i", unitsPerNode))
    cluster.registerStream(StreamMeta("payments", Seq("cardId", "merchantId"),
      Payments.schemaFields, partitionsPerTopic = 4))
    cluster
  }

  private def mkEvents(n: Int, seed: Long = 3, keys: Int = 6): Seq[Event] = {
    val rnd = new Random(seed)
    var ts = 1000L
    (1 to n).map { i =>
      ts += 1 + rnd.nextInt(5)
      Event(i.toLong, ts, Map(
        "cardId" -> s"c${rnd.nextInt(keys)}",
        "merchantId" -> s"m${rnd.nextInt(3)}",
        "amount" -> (rnd.nextInt(90) + 10).toDouble,
        "country" -> "PT"))
    }
  }

  test("Example 1 end-to-end: Q1 (sum,count per card) and Q2 (avg per merchant)") {
    val cluster = mkCluster()
    cluster.addQuery("q1",
      "SELECT sum(amount), count(*) FROM payments GROUP BY cardId OVER sliding 200 ms")
    cluster.addQuery("q2",
      "SELECT avg(amount) FROM payments GROUP BY merchantId OVER sliding 200 ms")
    val events = mkEvents(150)
    val byCard = TestKit.bruteSliding(events, 200, _.str("cardId"))
    val byMerchant = TestKit.bruteSliding(events, 200, _.str("merchantId"))
    events.zipWithIndex.foreach { case (e, i) =>
      val results = cluster.process("payments", e)
      assert(results.size == 3, s"expected 3 metric results, got $results")
      val sum = results.find(r => r.query == "q1" && r.agg == "sum(amount)").get.value
      val cnt = results.find(r => r.query == "q1" && r.agg == "count(*)").get.value
      val av = results.find(r => r.query == "q2" && r.agg == "avg(amount)").get.value
      assert(TestKit.approxEq(sum, TestKit.sum(byCard(i), "amount")), s"sum @ $i")
      assert(cnt.contains(TestKit.count(byCard(i))), s"count @ $i")
      assert(TestKit.approxEq(av, TestKit.avg(byMerchant(i), "amount")), s"avg @ $i")
    }
    cluster.close()
  }

  test("events route by partitioner: one topic per group-by entity (Figure 3)") {
    val cluster = mkCluster()
    assert(cluster.kafka.topicExists("payments.cardId"))
    assert(cluster.kafka.topicExists("payments.merchantId"))
    assert(cluster.kafka.partitionsOf("payments.cardId") == 4)
    cluster.close()
  }

  test("every (topic, partition) has exactly one active owner; replicas elsewhere") {
    val cluster = mkCluster(nodes = 3, unitsPerNode = 2, rf = 2)
    cluster.addQuery("q", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 100 ms")
    mkEvents(60).foreach(e => cluster.process("payments", e))
    val units = cluster.allUnits
    val actives = units.flatMap(_.activeConsumer.assignment)
    assert(actives.distinct.size == actives.size, "duplicate active ownership")
    assert(actives.size == 8) // 2 topics x 4 partitions
    val replicas = units.flatMap(u => u.replicaConsumer.assignment.map(u.nodeId -> _))
    // replica copies live on different nodes than the active ones
    replicas.foreach { case (node, tp) =>
      val activeNode = units.find(_.activeConsumer.assignment.contains(tp)).map(_.nodeId)
      assert(!activeNode.contains(node), s"replica of $tp co-located on $node")
    }
    cluster.close()
  }

  test("duplicate deliveries do not change aggregates (exactly-once effects)") {
    val cluster = mkCluster(nodes = 1, unitsPerNode = 1, rf = 1)
    cluster.addQuery("q", "SELECT count(*), sum(amount) FROM payments GROUP BY cardId OVER sliding 1000 ms")
    val e1 = Event(1, 1000, Map("cardId" -> "c1", "merchantId" -> "m1", "amount" -> 10.0))
    val first = cluster.process("payments", e1)
    assert(first.find(_.agg == "count(*)").get.value.contains(1L))
    // duplicate (same id) — e.g. an at-least-once redelivery through the front-end
    val dup = cluster.process("payments", e1.copy(ts = 1005))
    assert(dup.find(_.agg == "count(*)").get.value.contains(1L), s"duplicate counted: $dup")
    assert(dup.find(_.agg == "sum(amount)").get.value.exists(v => TestKit.anyNum(v) == 10.0))
    cluster.close()
  }

  test("node failure: replicas are promoted and results stay correct") {
    val cluster = mkCluster(nodes = 3, unitsPerNode = 1, rf = 2)
    cluster.addQuery("q", "SELECT count(*), sum(amount) FROM payments GROUP BY cardId OVER sliding 300 ms")
    val events = mkEvents(200, seed = 8)
    val byCard = TestKit.bruteSliding(events, 300, _.str("cardId"))
    val (before, after) = events.splitAt(100)
    before.zipWithIndex.foreach { case (e, i) =>
      val r = cluster.process("payments", e)
      assert(r.find(_.agg == "count(*)").get.value.contains(TestKit.count(byCard(i))), s"pre-fail @ $i")
    }
    cluster.failNode("node1")
    after.zipWithIndex.foreach { case (e, i) =>
      val idx = 100 + i
      val r = cluster.process("payments", e)
      assert(r.find(_.agg == "count(*)").get.value.contains(TestKit.count(byCard(idx))),
        s"post-fail @ $idx")
      assert(TestKit.approxEq(r.find(_.agg == "sum(amount)").get.value,
        TestKit.sum(byCard(idx), "amount")), s"post-fail sum @ $idx")
    }
    cluster.close()
  }

  test("failure without replicas: state recovers from checkpoint + log replay") {
    val cluster = mkCluster(nodes = 2, unitsPerNode = 1, rf = 1)
    cluster.addQuery("q", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 400 ms")
    val events = mkEvents(150, seed = 21)
    val byCard = TestKit.bruteSliding(events, 400, _.str("cardId"))
    val (before, after) = events.splitAt(80)
    before.foreach(e => cluster.process("payments", e))
    cluster.allUnits.foreach(_.checkpointAll())
    cluster.failNode("node0")
    after.zipWithIndex.foreach { case (e, i) =>
      val idx = 80 + i
      val r = cluster.process("payments", e)
      assert(r.find(_.agg == "count(*)").get.value.contains(TestKit.count(byCard(idx))),
        s"post-fail @ $idx (recovered from log replay)")
    }
    cluster.close()
  }

  test("graceful node removal preserves correctness") {
    val cluster = mkCluster(nodes = 3, unitsPerNode = 1, rf = 2)
    cluster.addQuery("q", "SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding 250 ms")
    val events = mkEvents(160, seed = 31)
    val byCard = TestKit.bruteSliding(events, 250, _.str("cardId"))
    val (before, after) = events.splitAt(80)
    before.foreach(e => cluster.process("payments", e))
    cluster.removeNode("node2")
    after.zipWithIndex.foreach { case (e, i) =>
      val idx = 80 + i
      val r = cluster.process("payments", e)
      assert(TestKit.approxEq(r.head.value, TestKit.sum(byCard(idx), "amount")), s"@ $idx")
    }
    cluster.close()
  }

  test("adding a node rebalances; processing continues correctly (sticky, minimal shuffle)") {
    val cluster = mkCluster(nodes = 1, unitsPerNode = 2, rf = 2)
    cluster.addQuery("q", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 300 ms")
    val events = mkEvents(160, seed = 44)
    val byCard = TestKit.bruteSliding(events, 300, _.str("cardId"))
    val (before, after) = events.splitAt(70)
    before.foreach(e => cluster.process("payments", e))
    cluster.addNode("late-node", 2)
    after.zipWithIndex.foreach { case (e, i) =>
      val idx = 70 + i
      val r = cluster.process("payments", e)
      assert(r.head.value.contains(TestKit.count(byCard(idx))), s"@ $idx")
    }
    // the new node actually took over some work
    val lateUnits = cluster.allUnits.filter(_.nodeId == "late-node")
    assert(lateUnits.exists(u =>
      u.activeConsumer.assignment.nonEmpty || u.replicaConsumer.assignment.nonEmpty))
    cluster.close()
  }

  test("adding a metric mid-stream backfills from the reservoir (operational request)") {
    val cluster = mkCluster(nodes = 2, unitsPerNode = 1, rf = 1)
    cluster.addQuery("q1", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 500 ms")
    val events = mkEvents(120, seed = 52)
    val byCard = TestKit.bruteSliding(events, 500, _.str("cardId"))
    val (before, after) = events.splitAt(60)
    before.foreach(e => cluster.process("payments", e))
    cluster.addQuery("q2", "SELECT sum(amount) FROM payments GROUP BY cardId OVER sliding 500 ms")
    after.zipWithIndex.foreach { case (e, i) =>
      val idx = 60 + i
      val r = cluster.process("payments", e)
      assert(TestKit.approxEq(r.find(_.query == "q2").get.value,
        TestKit.sum(byCard(idx), "amount")), s"backfilled q2 @ $idx")
    }
    cluster.close()
  }

  test("queries on different partitioners of one stream run in different topics") {
    val cluster = mkCluster(nodes = 2, unitsPerNode = 1, rf = 1)
    cluster.addQuery("qc", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 100 ms")
    cluster.addQuery("qm", "SELECT count(*) FROM payments GROUP BY merchantId OVER sliding 100 ms")
    val e = Event(1, 1000, Map("cardId" -> "c1", "merchantId" -> "m1", "amount" -> 5.0))
    val r = cluster.process("payments", e)
    assert(r.count(_.query == "qc") == 1 && r.count(_.query == "qm") == 1)
    cluster.close()
  }

  test("a metric grouping by (card, merchant) can ride the card topic (§4)") {
    val cluster = mkCluster(nodes = 2, unitsPerNode = 1, rf = 1)
    cluster.addQuery("qcm",
      "SELECT count(*) FROM payments GROUP BY cardId, merchantId OVER sliding 300 ms")
    val events = mkEvents(100, seed = 61, keys = 3)
    val keyOf = (e: Event) => e.str("cardId") + "|" + e.str("merchantId")
    val windows = TestKit.bruteSliding(events, 300, keyOf)
    events.zipWithIndex.foreach { case (e, i) =>
      val r = cluster.process("payments", e)
      assert(r.find(_.query == "qcm").get.value.contains(TestKit.count(windows(i))), s"@ $i")
    }
    cluster.close()
  }

  test("checkpoint offsets let a cold unit resume without reprocessing effects") {
    val cluster = mkCluster(nodes = 1, unitsPerNode = 1, rf = 1)
    cluster.addQuery("q", "SELECT count(*) FROM payments GROUP BY cardId OVER sliding 10000 ms")
    val events = mkEvents(100, seed = 71, keys = 1) // single key: strict count
    events.take(50).foreach(e => cluster.process("payments", e))
    cluster.allUnits.foreach(_.checkpointAll())
    val r = cluster.process("payments", events(50))
    assert(r.head.value.contains(51L))
    cluster.close()
  }
}

package jobs

import repro.core.engine.{RailgunCluster, StreamMeta}
import repro.messaging.MiniKafka
import repro.spark.Payments

import java.nio.file.Files

/** spark-submit entrypoint running the full Railgun engine end-to-end over
  * the in-process substrate: Example 1's queries (Q1 per card, Q2 per
  * merchant), a 3-node cluster with replication factor 2, a node failure
  * mid-stream, and correct per-event answers throughout.
  *
  *   spark-submit --class jobs.RailgunDemoJob target/scala-2.13/repro_2.13-*.jar
  */
object RailgunDemoJob {
  def main(args: Array[String]): Unit = {
    val n = if (args.nonEmpty) args(0).toInt else 2000
    val cluster = new RailgunCluster(new MiniKafka,
      Files.createTempDirectory("railgun-demo"), replicationFactor = 2)
    (0 until 3).foreach(i => cluster.addNode(s"node$i", 2))
    cluster.registerStream(StreamMeta("payments", Seq("cardId", "merchantId"),
      Payments.schemaFields, partitionsPerTopic = 4))
    cluster.addQuery("q1",
      "SELECT sum(amount), count(*) FROM payments GROUP BY cardId OVER sliding 5 minutes")
    cluster.addQuery("q2",
      "SELECT avg(amount) FROM payments GROUP BY merchantId OVER sliding 5 minutes")
    val events = Payments.events(n, ratePerSec = 500)
    var processed = 0L
    events.foreach { e =>
      val results = cluster.process("payments", e)
      processed += 1
      if (processed == n / 2) {
        println(s"[demo] failing node1 after $processed events...")
        cluster.failNode("node1")
      }
      if (processed % 500 == 0 || processed == 1)
        println(s"[demo] event $processed -> " +
          results.map(r => s"${r.query}.${r.agg}=${r.value.getOrElse("-")}").mkString(", "))
    }
    println(s"[demo] processed $processed events; " +
      s"rebalances=${cluster.kafka.rebalances} recoveries=${cluster.recoveries.size}")
    cluster.close()
  }
}

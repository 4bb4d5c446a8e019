package jobs

/** spark-submit entrypoint for the §2.1/Figure 1 accuracy comparison of
  * hopping vs real-time sliding windows (runs on Spark/Catalyst).
  *
  *   spark-submit --class jobs.AccuracyJob target/scala-2.13/repro_2.13-*.jar
  */
object AccuracyJob {
  def main(args: Array[String]): Unit = repro.harness.Accuracy.main(args)
}

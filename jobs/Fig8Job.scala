package jobs

/** spark-submit entrypoint reproducing Figure 8 (Flink hopping windows vs
  * Railgun real-time sliding window latency distributions at 500 ev/s).
  *
  *   spark-submit --class jobs.Fig8Job target/scala-2.13/repro_2.13-*.jar
  */
object Fig8Job {
  def main(args: Array[String]): Unit = repro.harness.Fig8.main(args)
}

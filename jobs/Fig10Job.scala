package jobs

/** spark-submit entrypoint reproducing Figure 10 (near-linear node scaling
  * to 1M ev/s over 50 nodes, p99.9 < 250 ms).
  *
  *   spark-submit --class jobs.Fig10Job target/scala-2.13/repro_2.13-*.jar
  */
object Fig10Job {
  def main(args: Array[String]): Unit = repro.harness.Fig10.main(args)
}

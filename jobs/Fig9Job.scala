package jobs

/** spark-submit entrypoint reproducing Figure 9 (Railgun latency vs window
  * size and vs number of reservoir iterators).
  *
  *   spark-submit --class jobs.Fig9Job target/scala-2.13/repro_2.13-*.jar
  */
object Fig9Job {
  def main(args: Array[String]): Unit = repro.harness.Fig9.main(args)
}

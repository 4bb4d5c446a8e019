package repro.sim

/** Percentile extraction over latency samples (nearest-rank). */
object Percentiles {

  val standard: Seq[Double] = Seq(50.0, 75.0, 90.0, 95.0, 99.0, 99.9, 99.99)

  def of(samples: Array[Double], p: Double): Double = {
    require(samples.nonEmpty, "no samples")
    require(p > 0 && p <= 100, s"bad percentile $p")
    val sorted = samples.sorted
    val rank = math.ceil(p / 100.0 * sorted.length).toInt
    sorted(math.min(sorted.length, math.max(1, rank)) - 1)
  }

  def table(samples: Array[Double], ps: Seq[Double] = standard): Seq[(Double, Double)] = {
    val sorted = samples.sorted
    ps.map { p =>
      val rank = math.ceil(p / 100.0 * sorted.length).toInt
      p -> sorted(math.min(sorted.length, math.max(1, rank)) - 1)
    }
  }

  def fmt(ms: Double): String =
    if (ms >= 100000) f"${ms / 1000}%.0f s"
    else if (ms >= 1000) f"${ms / 1000}%.1f s"
    else f"$ms%.1f ms"
}

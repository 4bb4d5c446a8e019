package repro.sim

import scala.util.Random

/** End-to-end latency model replaying *measured* per-event service times
  * through an open-loop FIFO server at a fixed arrival rate, plus an
  * explicit messaging round-trip component (DESIGN.md §3 substitution 4).
  *
  * Open-loop means arrivals are scheduled by the clock, never by
  * completions — latency of a backlogged server keeps growing, which is the
  * coordinated-omission-corrected measurement the paper insists on ([26]).
  */
object QueueSim {

  /** Messaging-layer round trip (client → Kafka → engine → Kafka → client):
    * lognormal body calibrated so an unloaded engine sees the paper's
    * Railgun-like distribution (median ≈ 15–25 ms, p99.9 ≲ 150 ms), with a
    * rare broker hiccup tail — the run-to-run 99.99% wobble the paper
    * attributes to Kafka.
    */
  final case class RttModel(medianMs: Double = 16.0,
                            sigma: Double = 0.45,
                            spikeProb: Double = 0.0015,
                            spikeMs: Double = 90.0,
                            multiplier: Double = 1.0) {
    def sample(rnd: Random): Double = {
      val body = math.exp(math.log(medianMs) + sigma * rnd.nextGaussian())
      val spike = if (rnd.nextDouble() < spikeProb) spikeMs * (0.5 + rnd.nextDouble()) else 0.0
      (body + spike) * multiplier
    }
  }

  final case class Result(latenciesMs: Array[Double],
                          utilization: Double,
                          meanServiceMs: Double,
                          saturated: Boolean) {
    def p(q: Double): Double = Percentiles.of(latenciesMs, q)
  }

  /** Replays `nEvents` arrivals at `ratePerSec` through one server whose
    * service times cycle through `serviceTimesMs` (measured samples),
    * optionally scaled by `serviceMultiplier`.
    */
  /** Rare stop-the-world pause model (GC): adds `pauseMs`·U(0.5, 1.5) to an
    * event's service time with probability `prob` — sampled independently
    * per event so pauses are Poisson-like, not periodic.
    */
  final case class PauseModel(prob: Double = 0.0, pauseMs: Double = 60.0) {
    def sample(rnd: Random): Double =
      if (prob > 0 && rnd.nextDouble() < prob) pauseMs * (0.5 + rnd.nextDouble()) else 0.0
  }

  def run(ratePerSec: Double,
          nEvents: Int,
          serviceTimesMs: Array[Double],
          rtt: RttModel = RttModel(),
          serviceMultiplier: Double = 1.0,
          seed: Long = 42L,
          latencyCapMs: Double = 600000.0,
          pause: PauseModel = PauseModel()): Result = {
    require(serviceTimesMs.nonEmpty, "need service samples")
    require(ratePerSec > 0 && nEvents > 0, "bad load spec")
    val rnd = new Random(seed)
    val interArrivalMs = 1000.0 / ratePerSec
    var serverFree = 0.0
    var busy = 0.0
    val lat = new Array[Double](nEvents)
    var svcSum = 0.0
    var saturated = false
    var i = 0
    while (i < nEvents) {
      val arrival = i * interArrivalMs
      val svc = serviceTimesMs(i % serviceTimesMs.length) * serviceMultiplier + pause.sample(rnd)
      svcSum += svc
      val begin = math.max(arrival, serverFree)
      val end = begin + svc
      serverFree = end
      busy += svc
      val l = math.min(latencyCapMs, end - arrival + rtt.sample(rnd))
      if (l >= latencyCapMs) saturated = true
      lat(i) = l
      i += 1
    }
    val horizon = math.max(nEvents * interArrivalMs, serverFree)
    Result(lat, busy / horizon, svcSum / nEvents, saturated)
  }
}

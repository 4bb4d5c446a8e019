package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Fig9, Harness}

/** Table for Figure 9(b): Railgun latency vs the number of reservoir
  * iterators (misaligned windows), against a fixed 220-chunk reservoir
  * cache.
  *
  * Paper's reported shape: flat for 20–210 iterators (next chunk always in
  * cache); degradation once the iterator count reaches the cache size
  * (240 iterators vs 220 cache elements ⇒ cache misses + memory pressure).
  */
class Fig9bIteratorsBench extends AnyFunSuite {

  private lazy val rows: Seq[Harness.Row] = {
    val r = Fig9.runB()
    println(Harness.header("Figure 9b - Railgun latency vs #iterators (cache=220 chunks)"))
    r.foreach(x => println(x.render))
    r
  }

  private def row(prefix: String): Harness.Row =
    rows.find(_.label.trim.startsWith(prefix)).getOrElse(fail(s"missing row $prefix"))

  test("20 to 200 iterators: flat latencies, p99.9 < 250 ms") {
    Seq("20 iterators", "80 iterators", "160 iterators", "200 iterators").foreach { l =>
      val r = row(l)
      assert(!r.saturated, l)
      assert(r.p(99.9) < 250, s"$l p99.9=${r.p(99.9)}")
    }
  }

  test("medians stay flat while iterators fit in the cache") {
    val flat = Seq("20 iterators", "80 iterators", "160 iterators", "200 iterators")
      .map(l => row(l).p(50))
    assert(flat.max <= flat.min * 1.25, s"medians: $flat")
  }

  test("at 240 iterators (> 220-chunk cache) latency degrades sharply") {
    val ok = row("200 iterators")
    val broken = row("240 iterators")
    assert(broken.saturated || broken.p(99.9) > ok.p(99.9) * 5,
      s"no cliff: 240=${broken.p(99.9)} 200=${ok.p(99.9)}")
  }

  test("the degradation mechanism is cache misses (miss rate jumps)") {
    def miss(l: String): Double = {
      val s = row(l).label
      s.substring(s.indexOf("miss=") + 5).stripSuffix("%").toDouble
    }
    assert(miss("240 iterators") > miss("200 iterators") * 4,
      s"miss(240)=${miss("240 iterators")} miss(200)=${miss("200 iterators")}")
  }
}

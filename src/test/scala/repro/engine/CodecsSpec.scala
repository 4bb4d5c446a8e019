package repro.engine

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.engine.Codecs
import repro.core.model.Event
import repro.core.plan.MetricResult

/** Wire codecs between the front-end, the messaging layer and the back-end. */
class CodecsSpec extends AnyFunSuite {

  test("event round-trips through the wire format (property)") {
    val genVal: Gen[(String, Any)] = for {
      k <- Gen.identifier.map(_.take(10)).suchThat(_.nonEmpty)
      v <- Gen.oneOf(
        Gen.chooseNum(Long.MinValue, Long.MaxValue).map(x => x: Any),
        Gen.chooseNum(-1e9, 1e9).map(x => x: Any),
        Gen.alphaNumStr.map(s => s.take(20): Any))
    } yield (k, v)
    val genEvent = for {
      id <- Gen.chooseNum(0L, Long.MaxValue)
      ts <- Gen.chooseNum(0L, Long.MaxValue)
      vs <- Gen.mapOf(genVal)
    } yield Event(id, ts, vs)
    TestKit.checkProp(Prop.forAll(genEvent) { e =>
      Codecs.eventFromBytes(Codecs.eventToBytes(e)) == e
    })
  }

  test("event codec widens Int field values to Long") {
    val e = Event(1, 2, Map("n" -> 7))
    assert(Codecs.eventFromBytes(Codecs.eventToBytes(e)).values("n") == 7L)
  }

  test("reply round-trips all value shapes") {
    val reply = Codecs.Reply(42L, "payments.cardId", Seq(
      MetricResult("q1", "sum(amount)", Some(12.5)),
      MetricResult("q1", "count(*)", Some(3L)),
      MetricResult("q2", "avg(amount)", None),
      MetricResult("q3", "last(x)", Some("str"))))
    val back = Codecs.replyFromBytes(Codecs.replyToBytes(reply))
    assert(back == reply)
  }

  test("reply round-trip preserves order and empty result lists") {
    val reply = Codecs.Reply(7L, "t", Nil)
    assert(Codecs.replyFromBytes(Codecs.replyToBytes(reply)) == reply)
  }
}

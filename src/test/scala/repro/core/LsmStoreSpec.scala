package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.statestore.LsmStore

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}
import java.nio.charset.StandardCharsets.UTF_8

class LsmStoreSpec extends AnyFunSuite {

  private def b(s: String): Array[Byte] = s.getBytes(UTF_8)
  private def s(a: Array[Byte]): String = new String(a, UTF_8)

  test("put/get round-trips within the memtable") {
    val st = new LsmStore(TestKit.tempDir("lsm"))
    st.put("cf", "k1", b("v1"))
    assert(st.get("cf", "k1").map(s).contains("v1"))
    assert(st.get("cf", "nope").isEmpty)
  }

  test("column families namespace keys") {
    val st = new LsmStore(TestKit.tempDir("lsm"))
    st.put("a", "k", b("va")); st.put("b", "k", b("vb"))
    assert(st.get("a", "k").map(s).contains("va"))
    assert(st.get("b", "k").map(s).contains("vb"))
  }

  test("values survive a flush to a sorted segment") {
    val st = new LsmStore(TestKit.tempDir("lsm"), memtableLimit = 4)
    (1 to 10).foreach(i => st.put("cf", f"k$i%03d", b(s"v$i")))
    st.flush()
    assert(st.flushes >= 1)
    (1 to 10).foreach(i => assert(st.get("cf", f"k$i%03d").map(s).contains(s"v$i")))
  }

  test("newest value wins across memtable and multiple segments") {
    val st = new LsmStore(TestKit.tempDir("lsm"))
    st.put("cf", "k", b("v1")); st.flush()
    st.put("cf", "k", b("v2")); st.flush()
    st.put("cf", "k", b("v3"))
    assert(st.get("cf", "k").map(s).contains("v3"))
  }

  test("delete writes a tombstone that masks older segment values") {
    val st = new LsmStore(TestKit.tempDir("lsm"))
    st.put("cf", "k", b("v1")); st.flush()
    st.delete("cf", "k"); st.flush()
    assert(st.get("cf", "k").isEmpty)
  }

  test("compaction merges segments and drops tombstones") {
    val st = new LsmStore(TestKit.tempDir("lsm"), memtableLimit = 2, maxSegments = 3)
    (1 to 20).foreach(i => st.put("cf", s"k${i % 6}", b(s"v$i")))
    st.delete("cf", "k0")
    st.flush(); st.compact()
    assert(st.segmentCount == 1)
    assert(st.get("cf", "k0").isEmpty)
    assert(st.get("cf", "k1").isDefined)
  }

  test("automatic flush triggers when the memtable limit is hit") {
    val st = new LsmStore(TestKit.tempDir("lsm"), memtableLimit = 8)
    (1 to 100).foreach(i => st.put("cf", s"k$i", b(s"v$i")))
    assert(st.flushes > 0)
    (1 to 100).foreach(i => assert(st.get("cf", s"k$i").isDefined))
  }

  test("scanPrefix returns the merged live view in key order") {
    val st = new LsmStore(TestKit.tempDir("lsm"), memtableLimit = 3)
    st.put("cf", "p|a", b("1")); st.put("cf", "p|b", b("2")); st.flush()
    st.put("cf", "p|b", b("2x")); st.put("cf", "q|z", b("9")); st.delete("cf", "p|a")
    val got = st.scanPrefix("cf", "p|")
    assert(got.map(_._1) == Seq("p|b"))
    assert(got.map(kv => s(kv._2)) == Seq("2x"))
  }

  test("checkpoint + restore over the same directory recovers all data") {
    val dir = TestKit.tempDir("lsm-ckpt")
    val st = new LsmStore(dir, memtableLimit = 4)
    (1 to 30).foreach(i => st.put("cf", s"k$i", b(s"v$i")))
    st.delete("cf", "k7")
    val bos = new ByteArrayOutputStream()
    st.checkpoint(new DataOutputStream(bos))
    val re = LsmStore.restore(dir, new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
    (1 to 30).filter(_ != 7).foreach(i => assert(re.get("cf", s"k$i").map(s).contains(s"v$i")))
    assert(re.get("cf", "k7").isEmpty)
    // restored store accepts further writes
    re.put("cf", "new", b("x")); re.flush()
    assert(re.get("cf", "new").isDefined)
  }

  test("checkpoint files can be copied to another directory (recovery transfer)") {
    val src = TestKit.tempDir("lsm-src"); val dst = TestKit.tempDir("lsm-dst")
    val st = new LsmStore(src, memtableLimit = 2)
    (1 to 10).foreach(i => st.put("cf", s"k$i", b(s"v$i")))
    val bos = new ByteArrayOutputStream()
    st.checkpoint(new DataOutputStream(bos))
    LsmStore.copyFiles(src, dst)
    val re = LsmStore.restore(dst, new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
    (1 to 10).foreach(i => assert(re.get("cf", s"k$i").map(s).contains(s"v$i")))
  }

  test("random op sequences match an in-memory model (property)") {
    val genOp: Gen[(Int, String, String)] = for {
      op <- Gen.chooseNum(0, 2) // 0 put, 1 delete, 2 (checkpointing handled separately)
      k <- Gen.chooseNum(0, 30).map(i => s"k$i")
      v <- Gen.alphaNumStr.map(_.take(8))
    } yield (op, k, v)
    TestKit.checkProp(Prop.forAll(Gen.listOfN(120, genOp)) { ops =>
      val st = new LsmStore(TestKit.tempDir("lsm-prop"), memtableLimit = 7, maxSegments = 3)
      val model = collection.mutable.Map.empty[String, String]
      ops.foreach {
        case (0, k, v) => st.put("cf", k, b(v)); model(k) = v
        case (1, k, _) => st.delete("cf", k); model.remove(k)
        case (_, _, _) => st.flush()
      }
      (0 to 30).forall { i =>
        val k = s"k$i"
        st.get("cf", k).map(s) == model.get(k)
      }
    }, minSuccessful = 25)
  }

  test("gets/puts counters track the paper's access-pattern accounting") {
    val st = new LsmStore(TestKit.tempDir("lsm"))
    st.put("cf", "k", b("v")); st.get("cf", "k"); st.get("cf", "k2")
    assert(st.puts == 1 && st.gets == 2)
  }
}

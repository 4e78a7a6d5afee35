package repro.cloudstore

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance._
import org.scalacheck.Gen

import repro.GenChecks

class LocalCloudStorageSpec extends AnyFunSuite with GenChecks {

  private def fresh() = new LocalCloudStorage(NetworkModel())

  test("put then get returns identical bytes") {
    val s = fresh()
    forAllG(Gen.listOf(Gen.choose(Byte.MinValue, Byte.MaxValue)), trials = 25) { bs =>
      val bytes = bs.toArray
      s.put("b", bytes)
      assert(s.get("b", new FetchLedger).toSeq == bytes.toSeq)
    }
  }

  test("get of a missing blob fails with its name") {
    val e = intercept[IllegalArgumentException](fresh().get("nope", new FetchLedger))
    assert(e.getMessage.contains("nope"))
  }

  test("size and list reflect puts") {
    val s = fresh()
    s.put("a", Array[Byte](1, 2, 3))
    s.put("b", new Array[Byte](10))
    assert(s.size("a") == 3 && s.size("b") == 10)
    assert(s.list().toSet == Set("a", "b"))
    assert(s.totalBytes == 13)
  }

  test("getRange returns exactly the requested slice") {
    val s = fresh()
    val data = (0 until 100).map(_.toByte).toArray
    s.put("blob", data)
    forAllG(for {
      off <- Gen.choose(0, 99)
      len <- Gen.choose(0, 100 - off)
    } yield (off, len), trials = 50) { case (off, len) =>
      val got = s.getRange(RangeReq("blob", off.toLong, len), new FetchLedger)
      assert(got.toSeq == data.slice(off, off + len).toSeq)
    }
  }

  test("out-of-bounds range is rejected") {
    val s = fresh()
    s.put("blob", new Array[Byte](10))
    intercept[IllegalArgumentException](
      s.getRange(RangeReq("blob", 5, 6), new FetchLedger))
    intercept[IllegalArgumentException](
      s.getRange(RangeReq("blob", -1, 2), new FetchLedger))
  }

  test("sequential reads accumulate one ledger step each") {
    val s = fresh()
    s.put("blob", new Array[Byte](1000))
    val ledger = new FetchLedger
    s.getRange(RangeReq("blob", 0, 100), ledger)
    s.getRange(RangeReq("blob", 100, 100), ledger)
    s.get("blob", ledger)
    val st = ledger.stats
    assert(st.roundTripSteps == 3)
    assert(st.waitMs === 150.0 +- 1e-9)
    assert(st.bytes == 1200)
  }

  test("a parallel batch is ONE ledger step and pays one base latency") {
    val s = fresh()
    s.put("blob", new Array[Byte](1000))
    val ledger = new FetchLedger
    val out = s.getRangesParallel((0 until 10).map(i => RangeReq("blob", i * 100L, 100)), ledger)
    assert(out.size == 10)
    assert(out.forall(_.length == 100))
    val st = ledger.stats
    assert(st.roundTripSteps == 1)
    assert(st.waitMs === 50.0 +- 1e-9)
    assert(st.bytes == 1000)
  }

  test("parallel batch preserves request order in results") {
    val s = fresh()
    s.put("blob", (0 until 200).map(_.toByte).toArray)
    val reqs = Seq(RangeReq("blob", 100, 1), RangeReq("blob", 3, 1), RangeReq("blob", 77, 1))
    val out = s.getRangesParallel(reqs, new FetchLedger)
    assert(out.map(_.head) == Seq(100.toByte, 3.toByte, 77.toByte))
  }

  test("empty parallel batch is free") {
    val ledger = new FetchLedger
    assert(fresh().getRangesParallel(Nil, ledger).isEmpty)
    assert(ledger.stats == FetchStats.zero)
  }

  test("k-of-n returns k results tagged with their request indices") {
    val s = fresh()
    s.put("blob", (0 until 100).map(_.toByte).toArray)
    val reqs = (0 until 6).map(i => RangeReq("blob", i.toLong * 10, 1))
    val ledger = new FetchLedger
    val out = s.getRangesKofN(reqs, 4, ledger)
    assert(out.size == 4)
    out.foreach { case (idx, bytes) => assert(bytes.head == (idx * 10).toByte) }
    assert(ledger.stats.roundTripSteps == 1)
  }

  test("getNoCost does not touch any ledger") {
    val s = fresh()
    s.put("a", Array[Byte](9))
    assert(s.getNoCost("a").head == 9)
  }

  test("registry: register, resolve, unregister") {
    val s = fresh()
    CloudStorage.register("spec-bucket", s)
    assert(CloudStorage.named("spec-bucket") eq s)
    CloudStorage.unregister("spec-bucket")
    intercept[IllegalArgumentException](CloudStorage.named("spec-bucket"))
  }

  test("setModel switches the accounted region without touching data") {
    val s = fresh()
    s.put("a", new Array[Byte](100))
    val l1 = new FetchLedger
    s.get("a", l1)
    s.setModel(NetworkModel(region = Region.Singapore))
    val l2 = new FetchLedger
    s.get("a", l2)
    assert(l2.stats.waitMs === 7.5 * l1.stats.waitMs +- 1e-6)
  }

  test("concurrent readers through the shared pool all see correct bytes") {
    val s = fresh()
    val data = (0 until 10000).map(_.toByte).toArray
    s.put("big", data)
    val reqs = (0 until 500).map(i => RangeReq("big", i.toLong * 20, 20))
    val out = s.getRangesParallel(reqs, new FetchLedger)
    reqs.zip(out).foreach { case (r, b) =>
      assert(b.toSeq == data.slice(r.offset.toInt, r.offset.toInt + r.length).toSeq)
    }
  }

  test("FetchStats mean and percentile helpers") {
    val xs = (1 to 100).map(i => FetchStats(1, i.toDouble, 0.0, i.toLong))
    val m = FetchStats.mean(xs)
    assert(m.waitMs === 50.5 +- 1e-9)
    assert(FetchStats.percentileMs(xs, 0.99) === 99.0 +- 1.0)
    assert(FetchStats.percentileMs(xs, 1.0) == 100.0)
    intercept[IllegalArgumentException](FetchStats.mean(Nil))
  }

  test("FetchStats addition") {
    val a = FetchStats(1, 2.0, 3.0, 4L)
    val b = FetchStats(5, 6.0, 7.0, 8L)
    assert(a + b == FetchStats(6, 8.0, 10.0, 12L))
    assert((a + b).totalMs === 18.0 +- 1e-9)
  }
}

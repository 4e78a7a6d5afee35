package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.GenChecks
import repro.cloudstore.{FetchLedger, LocalCloudStorage, NetworkModel}

class MhtSpec extends AnyFunSuite with GenChecks {

  private val genMht: Gen[Mht] = for {
    layers <- Gen.choose(1, 5)
    bins <- Gen.choose(1, 64)
    seeds <- Gen.listOfN(layers, Gen.choose(Int.MinValue, Int.MaxValue))
    nBlocks <- Gen.choose(1, 5)
    density <- Gen.choose(0.0, 1.0)
    fills <- Gen.listOfN(layers * bins, Gen.choose(0.0, 1.0))
    nCommon <- Gen.choose(0, 10)
  } yield {
    val ptrs = Array.tabulate(layers, bins) { (l, b) =>
      if (fills(l * bins + b) < density)
        BinPointer((l + b) % nBlocks, b * 10, 7)
      else null
    }
    val common = (0 until nCommon).map(i => s"common$i" -> BinPointer(0, i * 3, 3)).toMap
    new Mht(layers, bins, seeds.toArray, ptrs.map(_.toArray),
            common, Array.tabulate(nBlocks)(i => s"blk-$i"), Array("docs-0", "docs-1"))
  }

  private def assertSame(a: Mht, b: Mht): Unit = {
    assert(b.layers == a.layers && b.binsPerLayer == a.binsPerLayer)
    assert(b.seeds.toSeq == a.seeds.toSeq)
    assert(b.blockBlobs.toSeq == a.blockBlobs.toSeq)
    assert(b.docBlobs.toSeq == a.docBlobs.toSeq)
    assert(b.commonWords == a.commonWords)
    (0 until a.layers).foreach { l =>
      (0 until a.binsPerLayer).foreach { bin =>
        assert(b.binPointers(l)(bin) == a.binPointers(l)(bin), s"pointer ($l, $bin)")
      }
    }
  }

  test("serialize/deserialize round trip preserves everything") {
    forAllG(genMht, trials = 100) { mht =>
      assertSame(mht, Mht.deserialize(mht.serialize()))
    }
  }

  test("deserialize rejects garbage") {
    intercept[IllegalArgumentException](Mht.deserialize("not a header".getBytes))
  }

  test("negative hash seeds survive the round trip") {
    val mht = new Mht(2, 4, Array(-123456789, Int.MinValue),
                      Array.fill(2)(new Array[BinPointer](4)), Map.empty,
                      Array("b"), Array("d"))
    val back = Mht.deserialize(mht.serialize())
    assert(back.seeds.toSeq == Seq(-123456789, Int.MinValue))
  }

  test("binOf matches Hashing.bin") {
    forAllG(Gen.zip(genMht, Gen.alphaNumStr), trials = 60) { case (mht, w) =>
      (0 until mht.layers).foreach { l =>
        assert(mht.binOf(w, l) == Hashing.bin(w, mht.seeds(l), mht.binsPerLayer))
      }
    }
  }

  test("pointersFor is None iff some layer's bin is empty") {
    forAllG(Gen.zip(genMht, Gen.alphaNumStr), trials = 100) { case (mht, w) =>
      val expectEmpty = (0 until mht.layers).exists(l => mht.binPointers(l)(mht.binOf(w, l)) == null)
      assert(mht.pointersFor(w).isEmpty == expectEmpty)
      mht.pointersFor(w).foreach(ps => assert(ps.size == mht.layers))
    }
  }

  test("rangeReq resolves block ids through the string table") {
    val mht = new Mht(1, 1, Array(1), Array(Array(BinPointer(1, 5, 9))),
                      Map.empty, Array("blk-0", "blk-1"), Array("d"))
    val req = mht.rangeReq(BinPointer(1, 5, 9))
    assert(req.blob == "blk-1" && req.offset == 5 && req.length == 9)
  }

  test("load fetches the header as one accounted request") {
    val store = new LocalCloudStorage(NetworkModel())
    val mht = new Mht(1, 2, Array(7), Array(Array(null, BinPointer(0, 0, 1))),
                      Map("the" -> BinPointer(0, 1, 2)), Array("blk"), Array("docs"))
    store.put("header", mht.serialize())
    val ledger = new FetchLedger
    val back = Mht.load(store, "header", ledger)
    assert(ledger.stats.roundTripSteps == 1)
    assert(ledger.stats.bytes == mht.serialize().length)
    assertSame(mht, back)
  }

  test("header stays small: O(B) bytes (paper: ~2 MB at B = 1e5)") {
    val layers = 2; val bins = 5000
    val ptrs = Array.fill(layers)(Array.tabulate(bins)(b => BinPointer(b % 3, b * 40, 35)))
    val mht = new Mht(layers, bins, Array(1, 2), ptrs, Map.empty,
                      Array("b0", "b1", "b2"), Array("d0"))
    val size = mht.serialize().length
    // ~5 bytes per pointer at B*L = 10000 pointers => well under 100 KB
    assert(size < 100_000, s"header is $size bytes")
  }
}

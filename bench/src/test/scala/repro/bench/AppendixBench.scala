package repro.bench

import repro.SparkSpec
import repro.exp.{Fig14Exp, Fig15Exp, Fig16Exp, Fig17Exp}

/** Reproduces appendix Fig. 14: term-index lookup latency, Airphant vs
  * the SQLite-like B-tree (paper: up to 2.79x faster mean, 2.81x p99).
  */
class Fig14Bench extends SparkSpec {

  private lazy val rows = Fig14Exp.run(spark)

  test("Fig 14 prints") {
    println(Fig14Exp.render(rows))
    assert(rows.size == 4 * 2)
  }

  test("Airphant single-round-trip lookup never loses to the B-tree") {
    Seq("cranfield", "hdfs", "windows", "spark").foreach { c =>
      val air = rows.find(r => r.corpus == c && r.engine.startsWith("Airphant")).get
      val bt = rows.find(r => r.corpus == c && r.engine.startsWith("SQLite")).get
      assert(air.meanMs <= bt.meanMs + 1.0, s"$c: mean")
      assert(air.p99Ms <= bt.p99Ms + 1.0, s"$c: p99")
    }
  }

  test("on the biggest dictionary the B-tree pays dependent page reads") {
    val air = rows.find(r => r.corpus == "hdfs" && r.engine.startsWith("Airphant")).get
    val bt = rows.find(r => r.corpus == "hdfs" && r.engine.startsWith("SQLite")).get
    assert(bt.meanMs > 1.2 * air.meanMs,
           s"hdfs: btree ${bt.meanMs} vs airphant ${air.meanMs}")
  }
}

/** Reproduces appendix Fig. 15: scalability with corpus size. Paper's
  * shape: baselines competitive on small corpora; Airphant overtakes as
  * size grows; Airphant's index is larger but within a small factor.
  */
class Fig15Bench extends SparkSpec {

  private lazy val rows = Fig15Exp.run(spark)

  private def mean(kind: String, n: Long, engine: String): Double =
    rows.find(r => r.kind == kind && r.nDocs == n && r.engine.startsWith(engine)).get.meanMs

  private def size(kind: String, n: Long, engine: String): Long =
    rows.find(r => r.kind == kind && r.nDocs == n && r.engine.startsWith(engine)).get.indexBytes

  test("Fig 15 prints") {
    println(Fig15Exp.render(rows))
    assert(rows.size == Fig15Exp.kinds.size * Fig15Exp.sizes.size * 3)
  }

  test("Airphant wins at the largest corpus size in every family") {
    Fig15Exp.kinds.foreach { kind =>
      val air = mean(kind, 100000L, "Airphant")
      assert(mean(kind, 100000L, "Lucene") > air, s"$kind: skip list")
      assert(mean(kind, 100000L, "SQLite") >= air - 1e-6, s"$kind: b-tree")
    }
  }

  test("baselines are competitive at the smallest size (paper's observation)") {
    Fig15Exp.kinds.foreach { kind =>
      val air = mean(kind, 1000L, "Airphant")
      val best = Seq(mean(kind, 1000L, "Lucene"), mean(kind, 1000L, "SQLite")).min
      assert(best <= air * 1.6, s"$kind: baselines not competitive at n=1e3")
    }
  }

  test("index sizes grow with the corpus for every engine") {
    Fig15Exp.kinds.foreach { kind =>
      Seq("Airphant", "Lucene", "SQLite").foreach { e =>
        val sizes = Fig15Exp.sizes.map(n => size(kind, n, e))
        assert(sizes == sizes.sorted, s"$kind/$e: $sizes")
      }
    }
  }

  test("Airphant's index stays within a small factor of the baselines' (paper: <=2.85x)") {
    Fig15Exp.kinds.foreach { kind =>
      val a = size(kind, 100000L, "Airphant")
      val l = size(kind, 100000L, "Lucene")
      assert(a.toDouble / l < 4.0, s"$kind: airphant $a vs lucene-like $l")
    }
  }
}

/** Reproduces appendix Fig. 16: tiny IoU structures on Cranfield. */
class Fig16Bench extends SparkSpec {

  private lazy val rows = Fig16Exp.run(spark)

  private def cell(b: Int, l: Int) = rows.find(r => r.b == b && r.l == l).get

  test("Fig 16 prints") {
    println(Fig16Exp.render(rows))
    assert(rows.size == Fig16Exp.bValues.size * Fig16Exp.lValues.size)
  }

  test("for fixed B some interior L minimises the error") {
    Fig16Exp.bValues.foreach { b =>
      val byL = Fig16Exp.lValues.map(cell(b, _))
      assert(byL.minBy(_.observedFp).l > 1, s"B=$b")
    }
  }

  test("false positives decrease across all L as B grows") {
    Fig16Exp.lValues.foreach { l =>
      val lo = cell(Fig16Exp.bValues.last, l).observedFp
      val hi = cell(Fig16Exp.bValues.head, l).observedFp
      assert(lo <= hi + 1.0, s"L=$l: B=3000 fp $lo vs B=1000 fp $hi")
    }
  }

  test("storage grows with L but sublinearly (shared postings)") {
    Fig16Exp.bValues.foreach { b =>
      val s1 = cell(b, 1).indexBytes
      val s16 = cell(b, 16).indexBytes
      assert(s16 > s1, s"B=$b: no growth")
      assert(s16 < 16L * s1, s"B=$b: superlinear growth")
    }
  }

  test("lookup latency at L=16 is far below 16x the L=1 latency (parallel IO)") {
    Fig16Exp.bValues.foreach { b =>
      assert(cell(b, 16).lookupMeanMs < 8 * cell(b, 1).lookupMeanMs, s"B=$b")
    }
  }
}

/** Reproduces appendix Fig. 17: tighter F0 budgets. */
class Fig17Bench extends SparkSpec {

  private lazy val rows = Fig17Exp.run(spark)

  test("Fig 17 prints") {
    println(Fig17Exp.render(rows))
    assert(rows.size == Fig17Exp.f0Values.size)
  }

  test("optimal L* grows only slightly as F0 tightens by 1e4 (exponential decay)") {
    val byTightness = rows.sortBy(-_.f0)
    val ls = byTightness.map(_.lStar)
    assert(ls == ls.sorted, s"L* not monotone: $ls")
    assert(ls.last - ls.head <= 3, s"L* spread too large: $ls")
  }

  test("latencies rise only mildly with the tighter budget") {
    val loose = rows.find(_.f0 == 1.0).get
    val tight = rows.find(_.f0 == 0.0001).get
    assert(tight.lookupMeanMs <= 2.5 * loose.lookupMeanMs)
    assert(tight.searchMeanMs <= 2.5 * loose.searchMeanMs)
  }
}

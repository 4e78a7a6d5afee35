package repro.bench

import repro.SparkSpec
import repro.exp.Fig6Exp

/** Reproduces Fig. 6: within-region end-to-end latency of the five
  * engines over the four corpora (virtual milliseconds, top-10 queries).
  *
  * Paper's shape at its (much larger) scale: AIRPHANT fastest on the log
  * corpora; Lucene competitive only on tiny Cranfield; Elasticsearch and
  * HashTable the slowest. Ratios grow with corpus size (≈√n at the
  * F0-optimal B), so ours are smaller — see EXPERIMENTS.md.
  */
class Fig6Bench extends SparkSpec {

  private lazy val rows = Fig6Exp.run(spark)

  private def mean(corpus: String, engine: String): Double =
    rows.find(r => r.corpus == corpus && r.engine.startsWith(engine)).get.meanMs

  test("Fig 6 prints") {
    println(Fig6Exp.render(rows))
    assert(rows.size == 4 * 5)
  }

  test("Airphant is the fastest engine on every log corpus") {
    Seq("hdfs", "windows", "spark").foreach { c =>
      val air = mean(c, "Airphant")
      rows.filter(_.corpus == c).foreach { r =>
        // 1 ms tolerance: on the windows corpus the B-tree's 2-page
        // dictionary is fully cached, giving sub-ms parity with Airphant.
        assert(r.meanMs >= air - 1.0, s"$c/${r.engine}: ${r.meanMs} < airphant $air")
      }
    }
  }

  test("Airphant stays in the paper's operating envelope") {
    // Paper: < 300 ms average everywhere, always under a second.
    rows.filter(_.engine.startsWith("Airphant")).foreach { r =>
      assert(r.meanMs < 1000, s"${r.corpus}: airphant mean ${r.meanMs}")
      assert(r.p99Ms < 2000, s"${r.corpus}: airphant p99 ${r.p99Ms}")
    }
  }

  test("Elasticsearch-like is consistently among the slowest (snapshot mounting)") {
    Fig6Exp // corpora
    Seq("cranfield", "hdfs", "windows", "spark").foreach { c =>
      val es = mean(c, "Elasticsearch")
      val others = rows.filter(r => r.corpus == c && !r.engine.startsWith("Elasticsearch") &&
                                    !r.engine.startsWith("HashTable"))
      others.foreach(r => assert(es > r.meanMs, s"$c: ES $es not slower than ${r.engine}"))
    }
  }

  test("HashTable pays for its false positives where superposts are FP-heavy") {
    // hdfs-like has the lowest relevant-fraction per L=1 superpost at our
    // scale, so its top-10 sampling keeps falling back to full fetches.
    // (The paper's extreme 378x blowup on Windows needs its 1e8-doc scale;
    // see EXPERIMENTS.md.)
    assert(mean("hdfs", "HashTable") > 1.2 * mean("hdfs", "Airphant"),
           "hdfs: hash table not visibly slower")
    Seq("cranfield", "hdfs", "windows", "spark").foreach { c =>
      assert(mean(c, "HashTable") >= mean(c, "Airphant") - 1e-6, c)
    }
    // The blowup mechanism is clearest in the tail: a query whose L=1
    // superpost merged a frequent word fetches thousands of FP documents.
    val htP99 = rows.find(r => r.corpus == "windows" && r.engine.startsWith("HashTable")).get.p99Ms
    val airP99 = rows.find(r => r.corpus == "windows" && r.engine.startsWith("Airphant")).get.p99Ms
    assert(htP99 > 5 * airP99, s"windows: hash table p99 $htP99 vs airphant $airP99")
  }

  test("dependent-read engines sit between Airphant and the worst") {
    Seq("hdfs", "spark").foreach { c =>
      assert(mean(c, "Lucene") > mean(c, "Airphant"))
      assert(mean(c, "SQLite") > mean(c, "Airphant"))
    }
  }

  test("p99 never beats the mean's engine ordering grossly (sanity)") {
    rows.foreach(r => assert(r.p99Ms >= r.meanMs - 1e-6, s"${r.corpus}/${r.engine}"))
  }
}

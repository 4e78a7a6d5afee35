package repro.bench

import repro.SparkSpec
import repro.exp.Fig8Exp

/** Reproduces Fig. 8: wait vs download breakdown on the Spark corpus.
  * Shape: Lucene/SQLite/Elasticsearch are wait-heavy (dependent reads);
  * HashTable's extra time is download-heavy (false-positive documents);
  * AIRPHANT minimises both at once.
  */
class Fig8Bench extends SparkSpec {

  private lazy val rows = Fig8Exp.run(spark)

  private def row(engine: String) = rows.find(_.engine.startsWith(engine)).get

  test("Fig 8 prints") {
    println(Fig8Exp.render(rows))
    assert(rows.size == 5)
  }

  test("Airphant has the lowest total latency in the breakdown") {
    val air = row("Airphant")
    rows.foreach { r =>
      assert(r.waitMs + r.downloadMs >= air.waitMs + air.downloadMs - 1e-6, r.engine)
    }
  }

  test("dependent-read engines wait more than Airphant") {
    val air = row("Airphant")
    Seq("Lucene", "SQLite", "Elasticsearch").foreach { e =>
      assert(row(e).waitMs > air.waitMs, s"$e wait ${row(e).waitMs} vs airphant ${air.waitMs}")
    }
  }

  test("Airphant issues the fewest sequential steps") {
    val air = row("Airphant")
    rows.foreach(r => assert(r.roundTripSteps >= air.roundTripSteps - 1e-6, r.engine))
  }

  test("HashTable's penalty shows up as download, not wait (false positives)") {
    val air = row("Airphant")
    val ht = row("HashTable")
    val extraDownload = ht.downloadMs - air.downloadMs
    val extraWait = ht.waitMs - air.waitMs
    assert(extraDownload > extraWait, s"extra download $extraDownload vs extra wait $extraWait")
    assert(ht.bytes > air.bytes, "hash table should transfer more bytes")
  }

  test("Elasticsearch-like transfers the most bytes (snapshot chunks)") {
    val es = row("Elasticsearch")
    rows.filterNot(_.engine.startsWith("Elasticsearch")).foreach { r =>
      assert(es.bytes > r.bytes, s"ES bytes ${es.bytes} vs ${r.engine} ${r.bytes}")
    }
  }
}

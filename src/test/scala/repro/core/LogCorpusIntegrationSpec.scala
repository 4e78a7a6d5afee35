package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.corpus.LogCorpusGen
import repro.exp.{Corpora, Workload}

/** End-to-end over a shape-matched log corpus (reduced HDFS-like): the
  * data path the benchmarks use, oracle-checked in `sbt test` too.
  */
class LogCorpusIntegrationSpec extends SparkSpec {

  private val config = IoUConfig(bins = 1200, f0 = 1.0)

  private lazy val corpus = Corpora.materialize(
    spark, "hdfs-it", "hdfs-it-bucket",
    LogCorpusGen.generate(spark, LogCorpusGen.hdfs.copy(nDocs = 4000, paramCardinality = 1300)))

  private lazy val built =
    Builder.build(spark, corpus.docs, corpus.bucket, "iou", config, Some(corpus.profile))

  private lazy val searcher = new Searcher(corpus.store, built.headerBlob)

  private lazy val postingsDf = {
    import spark.implicits._
    corpus.docs.select(concat($"blob", lit(":"), $"offset") as "doc_id",
                       explode(array_distinct(split($"text", "\\s+"))) as "word")
      .filter(length($"word") > 0).cache()
  }

  test("hdfs-shaped corpus drives the optimizer to a small L at its scaled B") {
    assert(built.optimizedLayers >= 2 && built.optimizedLayers <= 4,
           s"L* = ${built.optimizedLayers}")
  }

  test("template words land in the common-word exact bins") {
    // The most document-frequent words in a log corpus are its templates
    // (t<k>); the 1% reservation must capture them.
    val common = searcher.mht.commonWords.keySet
    assert(common.nonEmpty)
    assert(common.count(_.startsWith("t")) > common.size / 2,
           s"common words don't look like templates: ${common.take(5)}")
  }

  test("searches are exact for both template and parameter words (oracle)") {
    import spark.implicits._
    val words = Workload.sampleWords(corpus.vocab, 12, seed = 99) ++
      searcher.mht.commonWords.keys.take(3)
    words.distinct.foreach { w =>
      val r = searcher.search(w)
      Oracle.assertEquivalent(
        r.docs.map(_.ref.docId).toDF("doc_id"),
        s"SELECT doc_id FROM postings WHERE word = '$w'",
        "postings" -> postingsDf)
    }
  }

  test("template AND parameter boolean query is exact (oracle)") {
    import spark.implicits._
    val template = searcher.mht.commonWords.keys.head
    val param = corpus.vocab.find(_.startsWith("p")).get
    val r = searcher.searchBoolean(BoolQuery.And(Seq(
      BoolQuery.Term(template), BoolQuery.Term(param))))
    Oracle.assertEquivalent(
      r.docs.map(_.ref.docId).toDF("doc_id"),
      s"SELECT doc_id FROM postings WHERE word = '$template' INTERSECT " +
        s"SELECT doc_id FROM postings WHERE word = '$param'",
      "postings" -> postingsDf)
  }

  test("the airphant datasource agrees with the searcher on this corpus") {
    import spark.implicits._
    val w = corpus.vocab.find(_.startsWith("p")).get
    val viaSource = spark.read.format("airphant")
      .option("bucket", corpus.bucket)
      .option("header", built.headerBlob)
      .load()
      .filter($"word" === w)
      .select("doc_id").as[String].collect().toSet
    val viaSearcher = searcher.search(w).docs.map(_.ref.docId).toSet
    assert(viaSource == viaSearcher)
  }

  test("false positives stay near the F0 = 1 budget on this corpus") {
    val words = Workload.sampleWords(corpus.vocab, 150, seed = 100)
    val avg = words.map(w => searcher.search(w).falsePositives).sum.toDouble / words.size
    assert(avg <= 5.0, s"avg FP $avg")
  }

  test("MHT memory footprint is O(B): header bytes scale with bins, not docs") {
    val headerBytes = corpus.store.size(built.headerBlob)
    // ~6 bytes/pointer at B=1200 plus string tables: well under 64 KB.
    assert(headerBytes < 65536, s"header $headerBytes bytes")
  }
}

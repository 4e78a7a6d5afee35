package repro.corpus

import org.apache.spark.sql.functions._
import org.scalactic.Tolerance._

import repro.SparkSpec

class CorpusGenSpec extends SparkSpec {
  import org.apache.spark.sql.DataFrame

  private def texts(df: DataFrame): Seq[String] = {
    import spark.implicits._
    df.orderBy("doc_id").select("text").as[String].collect().toSeq
  }

  test("diag: one unique word per document") {
    val df = CorpusGen.diag(spark, 100)
    val ts = texts(df)
    assert(ts.size == 100)
    assert(ts.distinct.size == 100)
    ts.foreach(t => assert(t.matches("w\\d+")))
  }

  test("unif: words per doc and vocabulary bounds") {
    val df = CorpusGen.unif(spark, 200, nVocab = 50, wordsPerDoc = 8)
    val ts = texts(df)
    assert(ts.forall(_.split(" ").length == 8))
    val vocab = ts.flatMap(_.split(" ")).toSet
    assert(vocab.size <= 50 && vocab.size > 30)
  }

  test("generators are deterministic in (params, seed)") {
    assert(texts(CorpusGen.unif(spark, 50, 30, 5, seed = 9)) ==
           texts(CorpusGen.unif(spark, 50, 30, 5, seed = 9)))
    assert(texts(CorpusGen.unif(spark, 50, 30, 5, seed = 9)) !=
           texts(CorpusGen.unif(spark, 50, 30, 5, seed = 10)))
    assert(texts(CorpusGen.zipf(spark, 50, 30, 5)) == texts(CorpusGen.zipf(spark, 50, 30, 5)))
  }

  test("zipf: low ranks dominate (skewed draw)") {
    val df = CorpusGen.zipf(spark, 500, nVocab = 1000, wordsPerDoc = 10, alpha = 1.07)
    val counts = texts(df).flatMap(_.split(" ")).groupBy(identity).view.mapValues(_.size)
    val top = counts.getOrElse("w0", 0)
    val mid = counts.getOrElse("w499", 0)
    assert(top > 20 * math.max(1, mid), s"w0=$top w499=$mid")
  }

  test("zipfCdf is a proper monotone CDF ending at 1") {
    val cdf = CorpusGen.zipfCdf(100, 1.07)
    assert(cdf.length == 100)
    assert(cdf.zip(cdf.tail).forall { case (a, b) => b >= a })
    assert(cdf.last === 1.0 +- 1e-9)
  }

  test("searchCdf finds the first index with cdf >= u") {
    val cdf = Array(0.1, 0.5, 0.9, 1.0)
    assert(CorpusGen.searchCdf(cdf, 0.05) == 0)
    assert(CorpusGen.searchCdf(cdf, 0.1) == 0)
    assert(CorpusGen.searchCdf(cdf, 0.11) == 1)
    assert(CorpusGen.searchCdf(cdf, 0.95) == 3)
    assert(CorpusGen.searchCdf(cdf, 1.0) == 3)
  }

  test("docRng decorrelates documents") {
    val r1 = CorpusGen.docRng(1, 1).nextLong()
    val r2 = CorpusGen.docRng(1, 2).nextLong()
    assert(r1 != r2)
    assert(CorpusGen.docRng(1, 1).nextLong() == r1)
  }

  test("log corpora preserve the paper's doc:vocab ratio (sigma_X of Table II)") {
    // sigma_X ~ sqrt(n/|W|). Check HDFS-like (1.77) and Spark-like (2.53)
    // within tolerance; Cranfield (0.51) and Windows (11.73) are covered by
    // the Table II bench at full corpus scale.
    for ((spec, paperSigma) <- Seq((LogCorpusGen.hdfs, 1.77), (LogCorpusGen.sparkLogs, 2.53))) {
      val small = spec.copy(nDocs = spec.nDocs / 3,
                            paramCardinality = math.max(1, spec.paramCardinality / 3))
      val df = LogCorpusGen.generate(spark, small)
      val vocab = texts(df).flatMap(_.split(" ")).toSet.size
      val sigma = math.sqrt(small.nDocs.toDouble / vocab)
      assert(sigma === paperSigma +- 0.6, s"${spec.name}: sigma=$sigma")
    }
  }

  test("log corpora have the configured words per document") {
    val df = LogCorpusGen.generate(spark, LogCorpusGen.hdfs.copy(nDocs = 100))
    val wpd = texts(df).map(_.split(" ").length)
    assert(wpd.forall(_ == LogCorpusGen.hdfs.staticPerDoc + LogCorpusGen.hdfs.paramsPerDoc))
  }

  test("cranfield-like matches the original's scale: 1398 docs, ~86 words/doc") {
    assert(LogCorpusGen.cranfield.nDocs == 1398)
    assert(LogCorpusGen.cranfield.staticPerDoc == 86)
    assert(LogCorpusGen.cranfield.paramsPerDoc == 0)
  }

  test("byName resolves every registered corpus and rejects unknowns") {
    LogCorpusGen.all.foreach(s => assert(LogCorpusGen.byName(s.name) eq s))
    intercept[RuntimeException](LogCorpusGen.byName("nope"))
  }

  test("unknown synthetic kind is rejected by the corpora factory") {
    intercept[RuntimeException](
      repro.exp.Corpora.synthetic(spark, "nope", 10, 10, 1, "bad-kind"))
  }
}

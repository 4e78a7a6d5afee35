package repro.corpus

import org.apache.spark.sql.functions._
import org.scalactic.Tolerance._

import repro.{Oracle, SparkSpec}

class CorpusProfileSpec extends SparkSpec {

  private lazy val docs = {
    import spark.implicits._
    Seq(
      (0L, "hello world hello"),
      (1L, "hello airphant"),
      (2L, "cloud index cloud storage"),
      (3L, "world"),
    ).toDF("doc_id", "text")
  }

  test("counts on a hand-checked corpus") {
    val p = CorpusProfile.profile(spark, docs)
    assert(p.nDocs == 4)
    assert(p.nWords == 10)
    assert(p.nTerms == 6) // hello world airphant cloud index storage
    assert(p.distinctHist == Map(2 -> 2, 3 -> 1, 1 -> 1))
    assert(p.sumDistinct == 8)
  }

  test("top words ranked by document frequency, ties by word") {
    val p = CorpusProfile.profile(spark, docs)
    assert(p.topWords.head == ("hello", 2L) || p.topWords.head == ("world", 2L))
    assert(p.topWords.take(2).map(_._2).toSet == Set(2L))
    assert(p.topWords.map(_._1).distinct.size == p.topWords.size)
  }

  test("sigma_X matches the closed form sqrt((n|W| - sum|W_i|)/|W|^2)") {
    val p = CorpusProfile.profile(spark, docs)
    val want = math.sqrt((4.0 * 6 - 8.0) / 36.0)
    assert(p.sigmaX === want +- 1e-12)
  }

  test("histWithCi uses the uniform prior c_i = (|W| - |W_i|)/|W|") {
    val p = CorpusProfile.profile(spark, docs)
    p.histWithCi.foreach { case (wi, _, ci) =>
      assert(ci === (6.0 - wi) / 6.0 +- 1e-12)
    }
  }

  test("profile statistics agree with DuckDB over the exploded words relation") {
    import spark.implicits._
    val words = docs
      .select($"doc_id", explode(split($"text", "\\s+")) as "word")
    val perDoc = words.groupBy("doc_id")
      .agg(countDistinct("word") as "wi")
      .select($"doc_id".cast("string") as "doc_id", $"wi".cast("string") as "wi")
    Oracle.assertEquivalent(
      perDoc,
      "SELECT doc_id, CAST(COUNT(DISTINCT word) AS VARCHAR) AS wi FROM words GROUP BY doc_id",
      "words" -> words)
  }

  test("profile of a bigger generated corpus is self-consistent") {
    val raw = CorpusGen.unif(spark, 500, 200, 7)
    val p = CorpusProfile.profile(spark, raw)
    assert(p.nDocs == 500)
    assert(p.nWords == 3500)
    assert(p.distinctHist.values.sum == 500)
    assert(p.distinctHist.keys.forall(wi => wi >= 1 && wi <= 7))
    assert(p.sumDistinct <= p.nWords)
    assert(p.meanWordsPerDoc === 7.0 +- 1e-9)
  }

  test("maxTopWords caps the common-word ranking") {
    val raw = CorpusGen.unif(spark, 200, 100, 5)
    val p = CorpusProfile.profile(spark, raw, maxTopWords = 7)
    assert(p.topWords.size == 7)
    // ranking is by doc frequency descending
    assert(p.topWords.map(_._2).toSeq == p.topWords.map(_._2).sortBy(-_).toSeq)
  }

  test("empty corpus is rejected") {
    import spark.implicits._
    val empty = Seq.empty[(Long, String)].toDF("doc_id", "text")
    intercept[Exception](CorpusProfile.profile(spark, empty))
  }
}

package repro.exp

import org.scalactic.Tolerance._

import repro.SparkSpec
import repro.corpus.CorpusGen

class ExpHelpersSpec extends SparkSpec {

  test("sampleWords draws only vocabulary words, deterministically") {
    val vocab = Array("a", "b", "c", "d")
    val s1 = Workload.sampleWords(vocab, 50, seed = 1)
    val s2 = Workload.sampleWords(vocab, 50, seed = 1)
    assert(s1 == s2)
    assert(s1.toSet.subsetOf(vocab.toSet))
    assert(Workload.sampleWords(vocab, 50, seed = 2) != s1)
  }

  test("sampleWords is roughly uniform (the paper's p_w prior)") {
    val vocab = Array.tabulate(10)(i => s"w$i")
    val sample = Workload.sampleWords(vocab, 5000, seed = 3)
    val counts = sample.groupBy(identity).view.mapValues(_.size)
    vocab.foreach { w =>
      assert(counts(w).toDouble === 500.0 +- 200.0, s"$w drawn ${counts(w)} times")
    }
  }

  test("TableFmt renders aligned tables") {
    val out = TableFmt.render("t", Seq("col", "x"), Seq(Seq("aaa", "1"), Seq("b", "22")))
    val lines = out.split("\n")
    assert(lines.head == "== t")
    assert(lines.drop(1).map(_.length).distinct.size == 1, "misaligned rows")
  }

  test("TableFmt number and byte formatting") {
    assert(TableFmt.fmt(1.23456) == "1.23")
    assert(TableFmt.fmt(1.23456, 3) == "1.235")
    assert(TableFmt.fmtBytes(512) == "512 B")
    assert(TableFmt.fmtBytes(2048) == "2.0 KB")
    assert(TableFmt.fmtBytes(3 * 1024 * 1024) == "3.00 MB")
  }

  test("AccuracySim wordDocs equals a direct computation") {
    val corpus = Corpora.materialize(spark, "acc", "acc-bucket",
                                     CorpusGen.unif(spark, 60, 40, 5, seed = 21))
    try {
      val wd = AccuracySim.wordDocs(spark, corpus.docs)
      import spark.implicits._
      val direct = corpus.docs.select($"doc_id", $"text").as[(Long, String)].collect()
        .flatMap { case (d, t) => t.split("\\s+").distinct.map(w => (w, d)) }
        .groupBy(_._1).view.mapValues(_.map(_._2).distinct.sorted.toSeq).toMap
      assert(wd.keySet == direct.keySet)
      wd.foreach { case (w, ds) => assert(ds.toSeq == direct(w)) }
    } finally corpus.close()
  }

  test("AccuracySim observed FP is zero when bins far exceed words") {
    val corpus = Corpora.materialize(spark, "acc2", "acc2-bucket",
                                     CorpusGen.diag(spark, 50))
    try {
      val wd = AccuracySim.wordDocs(spark, corpus.docs)
      val sketch = AccuracySim.buildSketch(wd, b = 40000, l = 4)
      val fp = AccuracySim.observedFp(sketch, wd, wd.keys.toSeq)
      assert(fp === 0.0 +- 0.2)
    } finally corpus.close()
  }

  test("expectedFp matches IoUMath directly") {
    val corpus = Corpora.materialize(spark, "acc3", "acc3-bucket",
                                     CorpusGen.unif(spark, 80, 60, 6, seed = 23))
    try {
      val (exact, approx) = AccuracySim.expectedFp(corpus.profile, 200, 2)
      assert(exact > 0 && approx > 0 && exact >= approx - 1e-9)
    } finally corpus.close()
  }

  test("Fig9 cost rows are positive and monotone in data size") {
    val rows = Fig9Exp.run()
    assert(rows.nonEmpty)
    assert(rows.forall(_.relativeCost > 0))
    Fig9Exp.tauGrid.foreach { tau =>
      val byS = Fig9Exp.sizeGrid.map(s => rows.find(r => r.sBytes == s && r.tau == tau).get)
      assert(byS.map(_.relativeCost) == byS.map(_.relativeCost).sorted)
    }
  }

  test("materialize registers the bucket and close unregisters it") {
    val corpus = Corpora.materialize(spark, "reg", "reg-bucket", CorpusGen.diag(spark, 10))
    assert(repro.cloudstore.CloudStorage.named("reg-bucket") eq corpus.store)
    corpus.close()
    intercept[IllegalArgumentException](repro.cloudstore.CloudStorage.named("reg-bucket"))
  }
}

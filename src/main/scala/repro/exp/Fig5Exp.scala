package repro.exp

import org.apache.spark.sql.SparkSession

/** Figure 5 — average and expected false positives per query while
  * varying L for several B on Cranfield. Validates Eq. (2) against the
  * in-memory sketch: observed counts track F(L), drop rapidly from L = 1,
  * and rise again once the per-layer bin count gets too small.
  */
object Fig5Exp {

  final case class Row(b: Int, l: Int, observedFp: Double, expectedF: Double, approxF: Double)

  val bValues: Seq[Int] = Seq(1000, 1500, 2000, 2500, 3000)
  val lValues: Seq[Int] = Seq(1, 2, 4, 6, 8, 10, 12, 14, 16)

  def run(spark: SparkSession, nQueries: Int = 300): Seq[Row] = {
    val corpus = EngineCache.corpus(spark, "cranfield")
    val postings = AccuracySim.wordDocs(spark, corpus.docs)
    val queries = Workload.sampleWords(corpus.vocab, nQueries, seed = 55)
    for (b <- bValues; l <- lValues) yield {
      val sketch = AccuracySim.buildSketch(postings, b, l)
      val obs = AccuracySim.observedFp(sketch, postings, queries)
      val (exact, approx) = AccuracySim.expectedFp(corpus.profile, b, l)
      Row(b, l, obs, exact, approx)
    }
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Fig 5: false positives per query vs (B, L) on Cranfield-like",
      Seq("B", "L", "observed FP", "expected F(L)", "approx F^(L)"),
      rows.map(r => Seq(r.b.toString, r.l.toString, TableFmt.fmt(r.observedFp, 3),
                        TableFmt.fmt(r.expectedF, 3), TableFmt.fmt(r.approxF, 3))))
}

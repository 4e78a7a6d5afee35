package repro.exp

import org.apache.spark.sql.SparkSession

/** Table II — corpus statistics (#documents, #terms, #words, σ_X) for the
  * three synthetic families and the four (shape-matched) real corpora.
  * Our corpora are scaled down (see DESIGN.md); the scale-free observable
  * is σ_X ≈ sqrt(n/|W|), which the generators are tuned to preserve.
  */
object TableIIExp {

  /** One corpus's measured statistics next to the paper's. */
  final case class Row(corpus: String, nDocs: Long, nTerms: Long, nWords: Long,
                       sigmaX: Double, paperSigmaX: Double)

  /** Paper Table II's σ_X per corpus. */
  val paperSigma: Map[String, Double] = Map(
    "diag" -> 1.00, "unif" -> 1.00, "zipf" -> 1.41,
    "cranfield" -> 0.51, "hdfs" -> 1.77, "windows" -> 11.73, "spark" -> 2.53,
  )

  def run(spark: SparkSession): Seq[Row] = {
    val synth = Seq(
      ("diag", Corpora.synthetic(spark, "diag", 10000, 10000, 1, "t2-diag")),
      ("unif", Corpora.synthetic(spark, "unif", 10000, 10000, 10, "t2-unif")),
      ("zipf", Corpora.synthetic(spark, "zipf", 10000, 10000, 10, "t2-zipf")),
    )
    val logs = EngineCache.logCorpora.map(n => (n, EngineCache.corpus(spark, n)))
    (synth ++ logs).map { case (name, c) =>
      val p = c.profile
      val row = Row(name, p.nDocs, p.nTerms, p.nWords, p.sigmaX, paperSigma(name))
      if (synth.exists(_._1 == name)) c.close()
      row
    }
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Table II: corpus statistics (ours, scaled; paper sigma for comparison)",
      Seq("corpus", "#documents", "#terms", "#words", "sigma_X (ours)", "sigma_X (paper)"),
      rows.map(r => Seq(r.corpus, r.nDocs.toString, r.nTerms.toString, r.nWords.toString,
                        TableFmt.fmt(r.sigmaX), TableFmt.fmt(r.paperSigmaX))))
}

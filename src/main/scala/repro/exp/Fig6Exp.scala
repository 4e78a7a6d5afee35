package repro.exp

import org.apache.spark.sql.SparkSession

/** Figure 6 — within-region end-to-end search latency (mean and p99) of
  * all five engines over the four corpora, top-10 queries. The paper's
  * headline: AIRPHANT is fastest overall (except tiny Cranfield, where
  * Lucene wins), up to 8.97× over Lucene, 113× over Elasticsearch, 3.15×
  * over SQLite and 379× over HashTable. At our corpus scale the ratios
  * shrink (they grow with n, see EXPERIMENTS.md) but the ordering and the
  * win/loss pattern must hold.
  */
object Fig6Exp {

  final case class Row(corpus: String, engine: String, meanMs: Double, p99Ms: Double,
                       ratioVsAirphant: Double)

  def run(spark: SparkSession, nQueries: Int = 128): Seq[Row] = {
    EngineCache.logCorpora.flatMap { name =>
      val corpus = EngineCache.corpus(spark, name)
      val engines = EngineCache.engineSet(spark, name)
      val words = Workload.sampleWords(corpus.vocab, nQueries, seed = 66)
      val perEngine = engines.all.map { e =>
        val (mean, p99) = Workload.meanP99(Workload.searchStats(e, words))
        (e.name, mean, p99)
      }
      val airMean = perEngine.head._2
      perEngine.map { case (n, mean, p99) => Row(name, n, mean, p99, mean / airMean) }
    }
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Fig 6: end-to-end search latency, within region (virtual ms, top-10)",
      Seq("corpus", "engine", "mean ms", "p99 ms", "x vs Airphant"),
      rows.map(r => Seq(r.corpus, r.engine, TableFmt.fmt(r.meanMs, 1),
                        TableFmt.fmt(r.p99Ms, 1), TableFmt.fmt(r.ratioVsAirphant))))
}

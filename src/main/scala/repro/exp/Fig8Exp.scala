package repro.exp

import org.apache.spark.sql.SparkSession

import repro.cloudstore.FetchStats

/** Figure 8 — search-latency breakdown into wait time vs download time on
  * the Spark corpus (the paper's tcpdump analysis). Expected shape:
  * Lucene/SQLite are wait-heavy (dependent sequential reads), HashTable is
  * download-heavy (false-positive documents), AIRPHANT minimises both at
  * once (paper: 220 ms waiting, 117 ms downloading on real GCS).
  */
object Fig8Exp {

  final case class Row(engine: String, waitMs: Double, downloadMs: Double,
                       roundTripSteps: Double, bytes: Long)

  def run(spark: SparkSession, corpusName: String = "spark", nQueries: Int = 96): Seq[Row] = {
    val corpus = EngineCache.corpus(spark, corpusName)
    val engines = EngineCache.engineSet(spark, corpusName)
    val words = Workload.sampleWords(corpus.vocab, nQueries, seed = 88)
    engines.all.map { e =>
      val stats = Workload.searchStats(e, words)
      val m = FetchStats.mean(stats)
      Row(e.name, m.waitMs, m.downloadMs, stats.map(_.roundTripSteps).sum.toDouble / stats.size,
          m.bytes)
    }
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Fig 8: latency breakdown on Spark-like corpus (virtual ms per query)",
      Seq("engine", "wait ms", "download ms", "sequential steps", "bytes/query"),
      rows.map(r => Seq(r.engine, TableFmt.fmt(r.waitMs, 1), TableFmt.fmt(r.downloadMs, 1),
                        TableFmt.fmt(r.roundTripSteps, 1), TableFmt.fmtBytes(r.bytes))))
}

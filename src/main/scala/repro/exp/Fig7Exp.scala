package repro.exp

import org.apache.spark.sql.SparkSession

import repro.cloudstore.Region

/** Figure 7 — cross-region end-to-end latency on the Windows corpus: the
  * VM moves to London and Singapore while the bucket stays put. The paper
  * observes every system slows with distance, but AIRPHANT degrades the
  * mildest (2.4×/6.5× vs Lucene's 3.3×/8.2× and SQLite's 3.2×/8.0×)
  * because its one concurrent batch pays the longer round trip once.
  */
object Fig7Exp {

  final case class Row(region: String, engine: String, meanMs: Double, p99Ms: Double,
                       slowdownVsIowa: Double)

  def run(spark: SparkSession, corpusName: String = "windows", nQueries: Int = 96): Seq[Row] = {
    val corpus = EngineCache.corpus(spark, corpusName)
    val engines = EngineCache.engineSet(spark, corpusName)
    val words = Workload.sampleWords(corpus.vocab, nQueries, seed = 77)
    val base = corpus.store.model
    try {
      val perRegion = Region.all.map { region =>
        corpus.store.setModel(base.copy(region = region))
        engines.clearCaches() // fresh-VM condition in each region
        region -> engines.all.map { e =>
          val (mean, p99) = Workload.meanP99(Workload.searchStats(e, words))
          (e.name, mean, p99)
        }
      }
      val iowa = perRegion.head._2.map { case (n, mean, _) => n -> mean }.toMap
      perRegion.flatMap { case (region, res) =>
        res.map { case (n, mean, p99) => Row(region.name, n, mean, p99, mean / iowa(n)) }
      }
    } finally corpus.store.setModel(base)
  }

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "Fig 7: cross-region search latency, Windows-like corpus (virtual ms)",
      Seq("region", "engine", "mean ms", "p99 ms", "slowdown vs Iowa"),
      rows.map(r => Seq(r.region, r.engine, TableFmt.fmt(r.meanMs, 1),
                        TableFmt.fmt(r.p99Ms, 1), TableFmt.fmt(r.slowdownVsIowa))))
}

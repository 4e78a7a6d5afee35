package repro.exp

import scala.util.Random

import repro.baselines.SearchEngine
import repro.cloudstore.{FetchLedger, FetchStats}

/** Query workload generation and latency measurement. */
object Workload {

  /** Sample `n` query words uniformly (with replacement) from the
    * realised vocabulary — the paper's default query-word prior
    * p_w = 1/|W| (§IV-B).
    */
  def sampleWords(vocab: Array[String], n: Int, seed: Long = 2024L): Seq[String] = {
    require(vocab.nonEmpty)
    val rng = new Random(seed)
    Seq.fill(n)(vocab(rng.nextInt(vocab.length)))
  }

  /** Per-query end-to-end stats for a batch of searches (top-10 like the
    * paper's benchmarks, §V-A0c).
    */
  def searchStats(engine: SearchEngine, words: Seq[String],
                  topK: Option[Int] = Some(10)): Seq[FetchStats] =
    words.map(w => engine.search(w, topK).stats)

  /** Per-query term-index-lookup-only stats (paper's Fig. 14 observable). */
  def lookupStats(engine: SearchEngine, words: Seq[String]): Seq[FetchStats] =
    words.map { w =>
      val ledger = new FetchLedger
      engine.lookup(w, ledger)
      ledger.stats
    }

  /** Mean and 99th-percentile total latency of a per-query sample. */
  def meanP99(stats: Seq[FetchStats]): (Double, Double) =
    (stats.map(_.totalMs).sum / stats.size, FetchStats.percentileMs(stats, 0.99))
}

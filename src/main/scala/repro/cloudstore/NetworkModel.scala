package repro.cloudstore

import scala.util.hashing.MurmurHash3

/** A geographic region hosting the compute node, relative to the storage
  * bucket. The paper (§V-B0b) places VMs in Iowa (same region as the
  * bucket), London, and Singapore; further regions multiply the first-byte
  * latency and shave effective per-stream bandwidth.
  *
  * @param name               display name
  * @param latencyMultiplier  factor on the base (first-byte) latency
  * @param bandwidthFactor    factor (<= 1) on per-stream and aggregate bandwidth
  */
final case class Region(name: String, latencyMultiplier: Double, bandwidthFactor: Double)

object Region {
  /** Compute co-located with the bucket (paper: us-central1-c "Iowa"). */
  val Iowa: Region = Region("us-central1 (Iowa)", 1.0, 1.0)
  /** Paper: europe-west2-c; observed ~2.4–3.3x slowdown for parallel readers. */
  val London: Region = Region("europe-west2 (London)", 3.0, 0.75)
  /** Paper: asia-southeast1-b; observed ~6.5–8.2x slowdown. */
  val Singapore: Region = Region("asia-southeast1 (Singapore)", 7.5, 0.55)

  val all: Seq[Region] = Seq(Iowa, London, Singapore)
}

/** The cost of one network interaction, split the same way the paper's
  * tcpdump analysis splits it (§V-B0c): `waitMs` is time spent blocked
  * before bytes flow (first-byte latency, i.e. the round-trip overhead)
  * and `downloadMs` is time spent actually moving bytes.
  */
final case class Cost(waitMs: Double, downloadMs: Double, bytes: Long) {
  def totalMs: Double = waitMs + downloadMs
  def +(o: Cost): Cost = Cost(waitMs + o.waitMs, downloadMs + o.downloadMs, bytes + o.bytes)
}

object Cost { val zero: Cost = Cost(0.0, 0.0, 0L) }

/** Deterministic affine model of cloud-object-storage retrieval latency,
  * calibrated to the paper's Figure 2: the end-to-end time for a single
  * request is flat (~50 ms) up to ~2 MB and then grows linearly, i.e.
  *
  *   latency(bytes) = baseLatencyMs + bytes / bandwidth.
  *
  * A parallel batch of requests (the IoU Sketch lookup pattern) costs the
  * slowest single stream or the aggregate-bandwidth bound, whichever is
  * larger — the latter reproduces the bandwidth contention the paper
  * observes when the number of layers L grows (§V-D).
  *
  * Long-tail variability (§IV-G) is modelled as deterministic pseudo-random
  * multiplicative jitter on the first-byte latency, seeded per request, so
  * experiments are reproducible yet exhibit stragglers when
  * `tailProbability > 0`.
  *
  * @param baseLatencyMs        first-byte latency within region (Fig. 2: ~50 ms)
  * @param streamBandwidthBpms  per-stream bandwidth in bytes/ms (Fig. 2: ~2MB / 50ms = 40 MB/s)
  * @param aggregateStreams     effective number of saturating parallel streams the
  *                             NIC sustains (32 download threads share a small VM's NIC)
  * @param concurrency          download thread pool size (paper: 32 threads, §V-A0c);
  *                             a batch of n requests runs in ceil(n/concurrency)
  *                             sequential waves, each paying the first-byte latency —
  *                             this is what makes fetching thousands of
  *                             false-positive documents slow (paper's HashTable)
  * @param region               compute region relative to the bucket
  * @param tailProbability      probability a request is a long-tail straggler
  * @param tailMultiplier       straggler first-byte latency multiplier
  * @param jitterSeed           seed for the deterministic jitter stream
  */
final case class NetworkModel(
    baseLatencyMs: Double = 50.0,
    streamBandwidthBpms: Double = 40e6 / 1000.0,
    aggregateStreams: Double = 4.0,
    concurrency: Int = 32,
    region: Region = Region.Iowa,
    tailProbability: Double = 0.0,
    tailMultiplier: Double = 20.0,
    jitterSeed: Int = 42,
) {
  require(baseLatencyMs >= 0 && streamBandwidthBpms > 0 && aggregateStreams >= 1)
  require(concurrency >= 1)

  /** First-byte latency for one request identified by `requestKey`. */
  def waitMs(requestKey: String): Double = {
    val base = baseLatencyMs * region.latencyMultiplier
    if (tailProbability <= 0) base
    else {
      val h = MurmurHash3.stringHash(requestKey, jitterSeed)
      val u = ((h & 0x7fffffff).toDouble + 0.5) / Int.MaxValue.toDouble
      if (u < tailProbability) base * tailMultiplier else base
    }
  }

  private def streamBpms: Double = streamBandwidthBpms * region.bandwidthFactor
  private def aggregateBpms: Double = streamBpms * aggregateStreams

  /** Cost of a single sequential request of `bytes` bytes. */
  def single(requestKey: String, bytes: Long): Cost =
    Cost(waitMs(requestKey), bytes.toDouble / streamBpms, bytes)

  /** Cost of one *batch* of concurrent requests issued together.
    *
    * The batch drains through the `concurrency`-thread pool in
    * ceil(n/concurrency) waves. Total elapsed time is the per-wave
    * first-byte latencies summed plus the bandwidth term
    * (max(slowest single stream, aggregate-bandwidth bound) — many
    * medium requests contend for the NIC like the paper's Fig. 10c).
    *
    * Classification follows the paper's tcpdump rule (§V-B0c): only the
    * FIRST wave's latency is "wait" (no traffic yet); once streams are in
    * flight the aggregate link stays busy, so later waves' latencies are
    * accounted as download time. This is exactly why the paper sees
    * HashTable as download-heavy rather than wait-heavy.
    */
  def batch(requests: Seq[(String, Long)]): Cost = {
    if (requests.isEmpty) return Cost.zero
    val waits = requests.map { case (k, _) => waitMs(k) }
    val waveWaits = waits.sorted(Ordering[Double].reverse)
      .grouped(concurrency).map(_.head).toSeq
    val totalBytes = requests.map(_._2).sum
    val slowestStream = requests.map(_._2.toDouble / streamBpms).max
    val contended = totalBytes.toDouble / aggregateBpms
    Cost(waveWaits.head,
         waveWaits.tail.sum + math.max(slowestStream, contended),
         totalBytes)
  }

  /** Cost of a batch of `requests` where the caller only needs the fastest
    * `k` responses (IoU Sketch's built-in replication, §IV-G: issue L+
    * requests, wait for any L). Wait time is the k-th smallest first-byte
    * latency; download counts only the k winners' bytes. (Replication
    * batches are small — at most L+ requests — so a single wave.)
    */
  def batchKofN(requests: Seq[(String, Long)], k: Int): Cost = {
    require(k >= 1 && k <= requests.size, s"need 1 <= k=$k <= ${requests.size}")
    val byWait = requests.map { case (key, b) => (waitMs(key), b) }.sortBy(_._1)
    val winners = byWait.take(k)
    val totalBytes = winners.map(_._2).sum
    val slowestStream = winners.map(_._2.toDouble / streamBpms).max
    val contended = totalBytes.toDouble / aggregateBpms
    Cost(winners.last._1, math.max(slowestStream, contended), totalBytes)
  }
}

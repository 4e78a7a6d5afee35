package repro.cloudstore

import java.util.concurrent.{ConcurrentHashMap, Executors, TimeUnit}
import scala.concurrent.{Await, ExecutionContext, Future}
import scala.concurrent.duration.Duration
import scala.jdk.CollectionConverters._

/** In-process blob store with simulated network cost.
  *
  * Bytes live in a concurrent map (our corpora are ~10–100 MB, well within
  * heap); parallel batches are executed on a real fixed thread pool (the
  * paper uses 32 download threads, §V-A0c) so the concurrency code path is
  * genuinely exercised, while latency is accounted in virtual time by the
  * [[NetworkModel]]. Thread-safe: Spark local-mode tasks may read
  * concurrently through the [[CloudStorage.named]] registry.
  */
final class LocalCloudStorage(initialModel: NetworkModel, downloadThreads: Int = 32)
    extends CloudStorage {

  // Mutable so cross-region experiments (paper Fig. 7) can move the
  // "compute node" without re-uploading corpus and index blobs.
  @volatile private var currentModel: NetworkModel = initialModel
  def model: NetworkModel = currentModel
  def setModel(m: NetworkModel): Unit = { currentModel = m }

  private val blobs = new ConcurrentHashMap[String, Array[Byte]]()

  override def put(name: String, bytes: Array[Byte]): Unit = blobs.put(name, bytes)

  override def size(name: String): Long = lookup(name).length.toLong

  override def list(): Seq[String] = blobs.keys.asScala.toSeq

  private def lookup(name: String): Array[Byte] = {
    val b = blobs.get(name)
    require(b != null, s"blob not found: $name")
    b
  }

  private def slice(req: RangeReq): Array[Byte] = {
    val b = lookup(req.blob)
    require(req.offset >= 0 && req.offset + req.length <= b.length,
      s"range out of bounds: $req in blob of ${b.length} bytes")
    java.util.Arrays.copyOfRange(b, req.offset.toInt, req.offset.toInt + req.length)
  }

  override def get(name: String, ledger: FetchLedger): Array[Byte] = {
    val b = lookup(name)
    ledger.record(model.single(name, b.length.toLong))
    b.clone()
  }

  override def getRange(req: RangeReq, ledger: FetchLedger): Array[Byte] = {
    val out = slice(req)
    ledger.record(model.single(req.key, req.length.toLong))
    out
  }

  override def getRangesParallel(reqs: Seq[RangeReq], ledger: FetchLedger): Seq[Array[Byte]] = {
    if (reqs.isEmpty) return Nil
    val out = fetchConcurrently(reqs)
    ledger.record(model.batch(reqs.map(r => (r.key, r.length.toLong))))
    out
  }

  override def getRangesKofN(reqs: Seq[RangeReq], k: Int, ledger: FetchLedger): Seq[(Int, Array[Byte])] = {
    require(k >= 1 && k <= reqs.size)
    // Deterministic completion order = ascending simulated first-byte latency.
    val order = reqs.zipWithIndex.sortBy { case (r, _) => model.waitMs(r.key) }
    val winners = order.take(k)
    val bytes = fetchConcurrently(winners.map(_._1))
    ledger.record(model.batchKofN(reqs.map(r => (r.key, r.length.toLong)), k))
    winners.map(_._2).zip(bytes)
  }

  override def getNoCost(name: String): Array[Byte] = lookup(name).clone()

  /** Issue real concurrent reads on the shared download pool. */
  private def fetchConcurrently(reqs: Seq[RangeReq]): Seq[Array[Byte]] = {
    if (reqs.size == 1) return Seq(slice(reqs.head))
    implicit val ec: ExecutionContext = LocalCloudStorage.pool(downloadThreads)
    val fut = Future.traverse(reqs.toList)(r => Future(slice(r)))
    Await.result(fut, Duration(60, TimeUnit.SECONDS))
  }
}

object LocalCloudStorage {
  // One shared download pool per JVM; 32 threads matches the paper's setup.
  @volatile private var ecs = Map.empty[Int, ExecutionContext]

  private def pool(n: Int): ExecutionContext = synchronized {
    ecs.getOrElse(n, {
      val ec = ExecutionContext.fromExecutorService(
        Executors.newFixedThreadPool(n, r => {
          val t = new Thread(r, s"cloud-download-$n"); t.setDaemon(true); t
        }))
      ecs += n -> ec
      ec
    })
  }
}

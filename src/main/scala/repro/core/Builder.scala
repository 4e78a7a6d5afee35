package repro.core

import java.io.ByteArrayOutputStream

import org.apache.spark.TaskContext
import org.apache.spark.sql.{DataFrame, Encoders, Row, SparkSession}
import org.apache.spark.sql.functions._
import repro.cloudstore.CloudStorage
import repro.corpus.CorpusProfile

/** AIRPHANT Builder (§III-C0a): creates one IoU Sketch per corpus and
  * persists it on cloud storage.
  *
  * The pipeline is the paper's, expressed in DataFrames: parse documents
  * into words → profile (single pass, [[CorpusProfile]]) → optimise the
  * layer count (Algorithm 1) → aggregate superposts per (layer, bin) →
  * compact superposts into block blobs (§IV-C) → persist the MHT header.
  * Blocks are written from executors (one blob per partition), so the
  * build parallelises; only bin *pointers* are collected to the driver.
  */
object Builder {

  /** Handle to a persisted sketch. */
  final case class BuiltSketch(
      bucket: String,
      prefix: String,
      headerBlob: String,
      layers: Int,
      optimizedLayers: Int,
      binsPerLayer: Int,
      commonWordCount: Int,
      profile: CorpusProfile,
      indexBytes: Long,
  )

  /** Build and persist an IoU Sketch.
    *
    * @param docs       corpus frame: doc_id, blob, offset, length, text
    *                   (as produced by [[repro.corpus.CorpusWriter.write]])
    * @param bucket     registered [[CloudStorage]] bucket holding the corpus
    * @param prefix     blob-name prefix for all index blobs
    * @param profileOpt reuse a precomputed profile (skips the profiling pass)
    */
  def build(spark: SparkSession, docs: DataFrame, bucket: String, prefix: String,
            config: IoUConfig, profileOpt: Option[CorpusProfile] = None): BuiltSketch = {
    import spark.implicits._

    val profile = profileOpt.getOrElse(
      CorpusProfile.profile(spark, docs, maxTopWords = math.max(config.commonBins, 100)))
    val hist = profile.histWithCi.map { case (wi, cnt, ci) => IoUMath.HistRow(wi, cnt, ci) }

    val lStar = config.layersOverride.getOrElse {
      LayerOptimizer.minimizeLayers(config.iouBins, config.f0, hist) match {
        case Right(l) => l
        case Left(rej) => throw new IllegalArgumentException(
          s"IoU Sketch optimization rejected (B=${config.iouBins}, F0=${config.f0}): ${rej.message}")
      }
    }
    val totalLayers = lStar + config.extraLayers
    val binsPerLayer = math.max(1, config.iouBins / math.max(1, lStar))
    val seeds = config.seeds(totalLayers)

    // Common words (§IV-E): most document-frequent words get exact postings.
    val commonWords: Array[String] =
      profile.topWords.take(math.min(config.commonBins, profile.topWords.size)).map(_._1).toArray
    val sc = spark.sparkContext
    val bcCommonIdx = sc.broadcast(commonWords.zipWithIndex.toMap)

    // String-compress doc blob names to integer ids (§IV-C).
    val docBlobs = docs.select($"blob").distinct().as[String].collect().sorted
    val bcBlobIdx = sc.broadcast(docBlobs.zipWithIndex.toMap)

    val blobId = udf((b: String) => bcBlobIdx.value(b))
    val commonIdx = udf((w: String) => bcCommonIdx.value.getOrElse(w, -1))
    val binOf = udf((word: String, layer: Int) => Hashing.bin(word, seeds(layer), binsPerLayer))

    val wordDocs = docs
      .select(blobId($"blob") as "blobId", $"offset", $"length",
              explode(array_distinct(split($"text", "\\s+"))) as "word")
      .filter(length($"word") > 0)
      .withColumn("cidx", commonIdx($"word"))

    val layersArr = array((0 until totalLayers).map(lit(_)): _*)
    val regularSupers = wordDocs
      .filter($"cidx" === -1)
      .select($"word", struct($"blobId", $"offset", $"length") as "p",
              explode(layersArr) as "layer")
      .select($"layer", binOf($"word", $"layer") as "bin", $"p")
      .groupBy($"layer", $"bin")
      .agg(sort_array(collect_set($"p")) as "postings")

    // Common words ride in the same compaction with layer = -1, bin = word index.
    val commonSupers = wordDocs
      .filter($"cidx" =!= -1)
      .select(lit(-1) as "layer", $"cidx" as "bin", struct($"blobId", $"offset", $"length") as "p")
      .groupBy($"layer", $"bin")
      .agg(sort_array(collect_set($"p")) as "postings")

    val allSupers = regularSupers.unionByName(commonSupers)

    // Size blocks so each blob lands near the compaction target.
    val approxBytes = (profile.sumDistinct * totalLayers.toLong + profile.nDocs) * 6L
    val numBlocks = math.max(1, math.min(256,
      math.ceil(approxBytes.toDouble / config.blockTargetBytes).toInt))

    val ptrEnc = Encoders.tuple(Encoders.scalaInt, Encoders.scalaInt, Encoders.scalaInt,
                                Encoders.scalaLong, Encoders.scalaInt)
    val ptrs = allSupers
      .repartitionByRange(numBlocks, $"layer", $"bin")
      .sortWithinPartitions($"layer", $"bin")
      .mapPartitions { it =>
        val pid = TaskContext.getPartitionId()
        val buf = new ByteArrayOutputStream()
        val rows = Vector.newBuilder[(Int, Int, Int, Long, Int)]
        it.foreach { row =>
          val layer = row.getInt(0)
          val bin = row.getInt(1)
          val ps = row.getSeq[Row](2)
            .map(r => Posting(r.getInt(0), r.getLong(1), r.getInt(2)))
            .toIndexedSeq
          val bytes = PostingsCodec.encode(ps)
          rows += ((layer, bin, pid, buf.size().toLong, bytes.length))
          buf.write(bytes, 0, bytes.length)
        }
        val out = rows.result()
        if (out.nonEmpty)
          CloudStorage.named(bucket).put(s"$prefix/superposts-$pid", buf.toByteArray)
        out.iterator
      }(ptrEnc)
      .collect()

    // Dense block ids: only partitions that actually wrote a blob.
    val pids = ptrs.map(_._3).distinct.sorted
    val dense = pids.zipWithIndex.toMap
    val blockBlobs = pids.map(pid => s"$prefix/superposts-$pid")

    val binPtrArr = Array.fill(totalLayers)(new Array[BinPointer](binsPerLayer))
    val commonMap = Map.newBuilder[String, BinPointer]
    ptrs.foreach { case (layer, bin, pid, off, len) =>
      val p = BinPointer(dense(pid), off.toInt, len)
      if (layer >= 0) binPtrArr(layer)(bin) = p
      else commonMap += commonWords(bin) -> p
    }

    val mht = new Mht(totalLayers, binsPerLayer, seeds, binPtrArr,
                      commonMap.result(), blockBlobs, docBlobs)
    val store = CloudStorage.named(bucket)
    val headerBlob = s"$prefix/header"
    store.put(headerBlob, mht.serialize())

    val indexBytes = store.list().filter(_.startsWith(prefix + "/")).map(store.size).sum
    BuiltSketch(bucket, prefix, headerBlob, totalLayers, lStar, binsPerLayer,
                commonWords.length, profile, indexBytes)
  }
}

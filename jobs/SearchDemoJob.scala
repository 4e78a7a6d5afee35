package repro.jobs

import repro.core.{Builder, IoUConfig}
import repro.exp.{Corpora, Engines}

/** End-to-end demo: generate a corpus on the simulated bucket, build an
  * IoU Sketch, and run keyword queries through the `airphant`
  * DataSourceV2 — the distributed scan path (keyword pushed down, doc
  * fetches executed by parallel Spark tasks).
  *
  * Usage: `spark-submit --class repro.jobs.SearchDemoJob <jar> [corpus] [keyword...]`
  */
object SearchDemoJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("search-demo")
    val corpusName = args.headOption.getOrElse("hdfs")
    val corpus = Corpora.log(spark, corpusName, s"demo-$corpusName")
    val built = Builder.build(spark, corpus.docs, corpus.bucket, "airphant",
                              Engines.benchConfig, Some(corpus.profile))

    val keywords =
      if (args.length > 1) args.drop(1).toSeq
      else corpus.vocab.take(3).toSeq

    val df = spark.read.format("airphant")
      .option("bucket", corpus.bucket)
      .option("header", built.headerBlob)
      .load()
      .filter(org.apache.spark.sql.functions.col("word").isin(keywords: _*))

    println(s"corpus=$corpusName layers=${built.layers} binsPerLayer=${built.binsPerLayer} " +
            s"indexBytes=${built.indexBytes}")
    df.groupBy("word").count().orderBy("word").show(truncate = false)
    df.show(5, truncate = 60)
    spark.stop()
  }
}

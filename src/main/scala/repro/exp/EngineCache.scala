package repro.exp

import scala.collection.mutable

import org.apache.spark.sql.SparkSession

/** Per-JVM cache of built corpora and engine sets so the bench suites
  * that share the paper's four corpora (Figures 6, 7, 8, 14) build each
  * index exactly once. Test suites run sequentially in one forked JVM
  * (build.sbt), so plain synchronization suffices.
  */
object EngineCache {
  private val corpora = mutable.Map.empty[String, BuiltCorpus]
  private val engines = mutable.Map.empty[String, EngineSet]

  def corpus(spark: SparkSession, name: String): BuiltCorpus = synchronized {
    corpora.getOrElseUpdate(name, Corpora.log(spark, name, s"bench-$name"))
  }

  def engineSet(spark: SparkSession, name: String): EngineSet = synchronized {
    engines.getOrElseUpdate(name, Engines.build(spark, corpus(spark, name)))
  }

  /** The paper's four "real" corpora, in its display order. */
  val logCorpora: Seq[String] = Seq("cranfield", "hdfs", "windows", "spark")
}

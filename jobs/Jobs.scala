package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.exp._

/** Shared session bootstrap for all spark-submit entrypoints. */
private[jobs] object JobSession {
  def create(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Table II: corpus statistics. `spark-submit --class repro.jobs.TableIIJob`. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table2")
    println(TableIIExp.render(TableIIExp.run(spark)))
    spark.stop()
  }
}

/** Figure 5: false positives vs (B, L) on Cranfield-like. */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig5")
    println(Fig5Exp.render(Fig5Exp.run(spark)))
    spark.stop()
  }
}

/** Figure 6: within-region end-to-end latencies, all engines × corpora. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig6")
    println(Fig6Exp.render(Fig6Exp.run(spark)))
    spark.stop()
  }
}

/** Figure 7: cross-region latencies on the Windows-like corpus. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig7")
    println(Fig7Exp.render(Fig7Exp.run(spark)))
    spark.stop()
  }
}

/** Figure 8: wait/download latency breakdown on the Spark-like corpus. */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig8")
    println(Fig8Exp.render(Fig8Exp.run(spark)))
    spark.stop()
  }
}

/** Figure 9: cost model curves (closed-form; no cluster work). */
object Fig9Job {
  def main(args: Array[String]): Unit =
    println(Fig9Exp.render(Fig9Exp.run()))
}

/** Figure 10: (B, L) structure sweep on the HDFS-like corpus. */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig10")
    val (rows, lStars) = Fig10Exp.run(spark)
    println(Fig10Exp.render(rows, lStars))
    spark.stop()
  }
}

/** Appendix Figure 14: term-index lookup latencies. */
object Fig14Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig14")
    println(Fig14Exp.render(Fig14Exp.run(spark)))
    spark.stop()
  }
}

/** Appendix Figure 15: scalability with corpus size. */
object Fig15Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig15")
    println(Fig15Exp.render(Fig15Exp.run(spark)))
    spark.stop()
  }
}

/** Appendix Figure 16: tiny IoU structures on Cranfield-like. */
object Fig16Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig16")
    println(Fig16Exp.render(Fig16Exp.run(spark)))
    spark.stop()
  }
}

/** Appendix Figure 17: accuracy budget sweep. */
object Fig17Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig17")
    println(Fig17Exp.render(Fig17Exp.run(spark)))
    spark.stop()
  }
}

package repro.bench

import org.scalactic.Tolerance._

import repro.SparkSpec
import repro.exp.TableIIExp

/** Reproduces Table II (corpus statistics). The scale-free observable —
  * σ_X ≈ sqrt(n/|W|) — must match the paper's per-corpus values even
  * though our corpora are thousands of times smaller.
  */
class TableIIBench extends SparkSpec {

  private lazy val rows = TableIIExp.run(spark)

  test("Table II prints") {
    println(TableIIExp.render(rows))
    assert(rows.size == 7)
  }

  test("sigma_X matches the paper per corpus") {
    val tolerance = Map(
      "diag" -> 0.05, "unif" -> 0.1, "zipf" -> 0.45,
      "cranfield" -> 0.15, "hdfs" -> 0.3, "windows" -> 2.5, "spark" -> 0.5)
    rows.foreach { r =>
      assert(r.sigmaX === r.paperSigmaX +- tolerance(r.corpus),
             s"${r.corpus}: sigma ${r.sigmaX} vs paper ${r.paperSigmaX}")
    }
  }

  test("corpus shapes: diag has one word per doc; cranfield keeps its true size") {
    val diag = rows.find(_.corpus == "diag").get
    assert(diag.nDocs == diag.nWords && diag.nDocs == diag.nTerms)
    val cran = rows.find(_.corpus == "cranfield").get
    assert(cran.nDocs == 1398)
    assert(cran.nTerms > 4000 && cran.nTerms < 6500) // paper: 5.3e3
  }

  test("log corpora preserve the paper's relative vocabulary ordering") {
    def terms(c: String) = rows.find(_.corpus == c).get.nTerms
    // Paper: windows has by far the smallest vocabulary relative to size;
    // hdfs the largest among the log corpora.
    assert(terms("windows") < terms("spark"))
    assert(terms("spark") < terms("hdfs"))
  }
}

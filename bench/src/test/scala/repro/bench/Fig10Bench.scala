package repro.bench

import repro.SparkSpec
import repro.exp.Fig10Exp

/** Reproduces Fig. 10: the (B, L) structure sweep on HDFS-like. Paper's
  * shape: false positives enormous at L=1, < ~1 at L=2, ~0 beyond;
  * lookup latency grows with L (bandwidth contention); the optimizer
  * selects L* = 2 at F0 = 1.
  */
class Fig10Bench extends SparkSpec {

  private lazy val (rows, lStars) = Fig10Exp.run(spark)

  private def cell(b: Int, l: Int) = rows.find(r => r.b == b && r.l == l).get

  test("Fig 10 prints") {
    println(Fig10Exp.render(rows, lStars))
    assert(rows.size == Fig10Exp.bValues.size * Fig10Exp.lValues.size)
  }

  test("false positives: enormous at L=1, near-budget at L=2, ~zero beyond") {
    assert(cell(Fig10Exp.bValues.head, 1).observedFp > 50, "smallest B not enormous at L=1")
    Fig10Exp.bValues.foreach { b =>
      assert(cell(b, 1).observedFp > 5, s"B=$b L=1 fp=${cell(b, 1).observedFp}")
      assert(cell(b, 2).observedFp < cell(b, 1).observedFp / 5, s"B=$b: L=2 not a cliff")
      assert(cell(b, 8).observedFp < 0.5, s"B=$b L=8 fp=${cell(b, 8).observedFp}")
      assert(cell(b, 16).observedFp < 0.5, s"B=$b L=16 fp=${cell(b, 16).observedFp}")
    }
  }

  test("observed false positives track the expectation at L=1") {
    Fig10Exp.bValues.foreach { b =>
      val r = cell(b, 1)
      assert(r.observedFp > 0.2 * r.expectedFp && r.observedFp < 5 * r.expectedFp,
             s"B=$b: observed ${r.observedFp} vs expected ${r.expectedFp}")
    }
  }

  test("the optimizer selects L* = 2 (paper's choice) at the benchmark B") {
    assert(lStars(5000) == 2, s"L* at B=5000 is ${lStars(5000)}")
    // Larger bin budgets never need more layers.
    assert(lStars(20000) <= lStars(2500) || lStars(2500) == -1)
  }

  test("L=1 search latency exceeds the optimum's (filtering cost)") {
    Fig10Exp.bValues.foreach { b =>
      assert(cell(b, 1).searchMeanMs > cell(b, 2).searchMeanMs,
             s"B=$b: L=1 ${cell(b, 1).searchMeanMs} vs L=2 ${cell(b, 2).searchMeanMs}")
    }
  }

  test("lookup latency grows with L (bandwidth contention)") {
    Fig10Exp.bValues.foreach { b =>
      val l2 = cell(b, 2).lookupMeanMs
      val l16 = cell(b, 16).lookupMeanMs
      assert(l16 >= l2, s"B=$b: lookup at L=16 ($l16) below L=2 ($l2)")
    }
  }

  test("lookup latency stays far below L x the single-layer cost (parallel IO)") {
    Fig10Exp.bValues.foreach { b =>
      assert(cell(b, 16).lookupMeanMs < 8 * cell(b, 1).lookupMeanMs,
             s"B=$b: parallelism lost")
    }
  }
}

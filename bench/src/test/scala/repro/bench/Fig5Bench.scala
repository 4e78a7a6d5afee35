package repro.bench

import repro.SparkSpec
import repro.exp.Fig5Exp

/** Reproduces Fig. 5: observed vs expected false positives per query over
  * (B, L) on Cranfield-like. Shape: FPs collapse when L goes 1 → 2, an
  * interior L is optimal (too many layers shrink each layer's bin count),
  * and the Eq. (2) expectation tracks observations.
  */
class Fig5Bench extends SparkSpec {

  private lazy val rows = Fig5Exp.run(spark)

  private def cell(b: Int, l: Int) = rows.find(r => r.b == b && r.l == l).get

  test("Fig 5 prints") {
    println(Fig5Exp.render(rows))
    assert(rows.size == Fig5Exp.bValues.size * Fig5Exp.lValues.size)
  }

  test("L = 1 (hash table) is far worse than L = 2 at every B") {
    Fig5Exp.bValues.foreach { b =>
      assert(cell(b, 1).observedFp > 3 * cell(b, 2).observedFp,
             s"B=$b: L=1 fp=${cell(b, 1).observedFp} vs L=2 fp=${cell(b, 2).observedFp}")
    }
  }

  test("an interior L minimises false positives (not the extremes)") {
    Fig5Exp.bValues.foreach { b =>
      val byL = Fig5Exp.lValues.map(l => cell(b, l))
      val best = byL.minBy(_.observedFp)
      assert(best.l > 1, s"B=$b: L=1 should never be optimal")
      // With small B the error curve turns back up for very large L.
      val last = byL.last
      assert(last.observedFp >= best.observedFp, s"B=$b: no upturn by L=16")
    }
  }

  test("more bins help at fixed L") {
    Fig5Exp.lValues.foreach { l =>
      val lo = cell(Fig5Exp.bValues.head, l).observedFp
      val hi = cell(Fig5Exp.bValues.last, l).observedFp
      assert(hi <= lo + 0.5, s"L=$l: B=3000 fp $hi vs B=1000 fp $lo")
    }
  }

  test("observed counts track the expected F(L) where it is non-negligible") {
    rows.filter(_.expectedF > 1.0).foreach { r =>
      assert(r.observedFp > 0.2 * r.expectedF && r.observedFp < 5.0 * r.expectedF,
             s"B=${r.b} L=${r.l}: observed ${r.observedFp} vs expected ${r.expectedF}")
    }
  }

  test("the exact expectation upper-bounds its exponential approximation") {
    rows.foreach(r => assert(r.expectedF >= r.approxF - 1e-9))
  }
}

package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance._

import repro.cost.CostModel
import repro.exp.Fig9Exp

/** Reproduces Fig. 9: the coupled-vs-decoupled cost curves. Closed-form,
  * so the paper's two headline numbers must match exactly: the storage
  * asymptote (≈3.29) and the VM-cost coefficient (≈13.48).
  */
class Fig9CostBench extends AnyFunSuite {

  private lazy val rows = Fig9Exp.run()

  test("Fig 9 prints") {
    println(Fig9Exp.render(rows))
    assert(rows.size == Fig9Exp.sizeGrid.size * Fig9Exp.tauGrid.size)
  }

  test("paper numbers: storage asymptote 3.29, VM coefficient 13.48") {
    assert(CostModel.storageAsymptote === 3.29 +- 0.01)
    assert(CostModel.vmCostCoefficient === 13.48 +- 0.05)
  }

  test("decoupled Airphant wins when data is large and peaks are rare") {
    val bigRare = rows.find(r => r.sBytes == 1e13 && r.tau == 0.01).get
    assert(bigRare.relativeCost > 1.5, s"C_E/C_A = ${bigRare.relativeCost}")
  }

  test("coupled Elasticsearch wins for small data under constant peak") {
    val smallSteady = rows.find(r => r.sBytes == 1e9 && r.tau == 1.0).get
    assert(smallSteady.relativeCost < 1.0, s"C_E/C_A = ${smallSteady.relativeCost}")
  }

  test("relative cost is monotone: decreasing in tau, increasing in data size") {
    Fig9Exp.sizeGrid.foreach { s =>
      val byTau = Fig9Exp.tauGrid.map(t => rows.find(r => r.sBytes == s && r.tau == t).get)
      assert(byTau.map(_.relativeCost).reverse == byTau.map(_.relativeCost).reverse.sorted.reverse ||
             byTau.map(_.relativeCost) == byTau.map(_.relativeCost).sorted.reverse)
    }
    Fig9Exp.tauGrid.foreach { t =>
      val byS = Fig9Exp.sizeGrid.map(s => rows.find(r => r.sBytes == s && r.tau == t).get)
      assert(byS.map(_.relativeCost) == byS.map(_.relativeCost).sorted)
    }
  }

  test("the largest data point approaches the asymptote from below") {
    val r = CostModel.relativeCost(Fig9Exp.aPeak, Fig9Exp.aTrough, 0.5, 1e16)
    assert(r === CostModel.storageAsymptote +- 0.02)
  }
}

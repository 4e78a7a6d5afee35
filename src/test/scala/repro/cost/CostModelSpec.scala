package repro.cost

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance._

class CostModelSpec extends AnyFunSuite {
  import CostModel._

  test("measured throughputs match the paper's constants") {
    assert(airphantOpsPerSec === 5.71 +- 0.01)
    assert(elasticOpsPerSec === 154.08 +- 0.01)
  }

  test("storage asymptote is the paper's 3.29") {
    assert(storageAsymptote === 3.29 +- 0.01)
  }

  test("VM-cost coefficient is the paper's 13.48") {
    assert(vmCostCoefficient === 13.48 +- 0.05)
  }

  test("relative cost approaches the storage asymptote as data grows") {
    val r = relativeCost(154.08, 7.704, 0.5, 1e15)
    assert(r === storageAsymptote +- 0.05)
  }

  test("airphant wins more as the peak fraction shrinks") {
    val rs = Seq(0.9, 0.5, 0.1, 0.01).map(t => relativeCost(154.08, 7.704, t, 1e11))
    assert(rs == rs.sorted) // C_E/C_A grows as tau falls
  }

  test("airphant wins more as data grows (every tau)") {
    Seq(0.1, 0.5, 1.0).foreach { tau =>
      val rs = Seq(1e9, 1e10, 1e11, 1e12).map(s => relativeCost(154.08, 7.704, tau, s))
      assert(rs == rs.sorted)
    }
  }

  test("elastic cost is linear in peak workload and data size") {
    assert(elasticCost(200, 1e9) > elasticCost(100, 1e9))
    assert(elasticCost(100, 2e9) === 2 * elasticCost(100, 1e9) -
           elasticCost(100, 0) +- 1e-6)
  }

  test("airphant cost interpolates between trough-only and peak-only") {
    val lo = airphantCost(154.08, 7.704, 0.0, 0)
    val hi = airphantCost(154.08, 7.704, 1.0, 0)
    val mid = airphantCost(154.08, 7.704, 0.5, 0)
    assert(lo < mid && mid < hi)
    assert(mid === (lo + hi) / 2 +- 1e-9)
  }

  test("VM break-even: steady full-peak workload favours Elasticsearch") {
    // tau = 1 (always at peak): Airphant pays ~13.48x more for VMs.
    val ca = airphantCost(154.08, 7.704, 1.0, 0)
    val ce = elasticCost(154.08, 0)
    assert(ca / ce === vmCostCoefficient +- 0.05)
  }

  test("invalid arguments rejected") {
    intercept[IllegalArgumentException](airphantCost(1, 1, 1.5, 0))
    intercept[IllegalArgumentException](elasticCost(-1, 0))
  }
}

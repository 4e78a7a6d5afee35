package repro.exp

import repro.cost.CostModel

/** Figure 9 — relative monthly cost C_E/C_A of coupled Elasticsearch vs
  * decoupled AIRPHANT over the peak-trough workload, as a function of the
  * peak-time fraction τ and the indexed data size. Fixed A = 154.08 op/s
  * (one ES server's throughput), a = A/20 = 7.704 op/s, like the paper.
  * This experiment is closed-form, so the reproduction is exact: the
  * storage asymptote must come out ≈ 3.29 and the VM-cost coefficient
  * ≈ 13.48.
  */
object Fig9Exp {

  final case class Row(sBytes: Double, tau: Double, relativeCost: Double)

  val aPeak: Double = CostModel.elasticOpsPerSec // 154.08 op/s
  val aTrough: Double = aPeak / 20.0             // 7.704 op/s
  val tauGrid: Seq[Double] = Seq(0.01, 0.05, 0.1, 0.2, 0.4, 0.6, 0.8, 1.0)
  val sizeGrid: Seq[Double] = Seq(1e9, 1e10, 1e11, 1e12, 1e13)

  def run(): Seq[Row] =
    for (s <- sizeGrid; tau <- tauGrid)
      yield Row(s, tau, CostModel.relativeCost(aPeak, aTrough, tau, s))

  def render(rows: Seq[Row]): String = {
    val table = TableFmt.render(
      "Fig 9: relative cost C_E/C_A (A=154.08 op/s, a=A/20)",
      Seq("data size", "tau (peak fraction)", "C_E / C_A"),
      rows.map(r => Seq(TableFmt.fmtSci(r.sBytes), TableFmt.fmt(r.tau),
                        TableFmt.fmt(r.relativeCost, 3))))
    table +
      f"\nstorage asymptote lim C_E/C_A = ${CostModel.storageAsymptote}%.2f (paper: 3.29)" +
      f"\nVM-cost coefficient = ${CostModel.vmCostCoefficient}%.2f (paper: 13.48)"
  }
}

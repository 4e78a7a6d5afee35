package repro.cost

/** The paper's cost comparison between the coupled (Elasticsearch on
  * local disk) and decoupled (AIRPHANT on cloud storage) paradigms under
  * the peak-trough workload (§V-C). All constants are the paper's
  * measured values; the model is closed-form, so this reproduction is
  * exact rather than simulated.
  *
  * Workload: peak throughput A ops/s for fraction τ of the time, trough
  * a ops/s for 1−τ. S = total size of original data in bytes.
  */
object CostModel {

  /** AIRPHANT on e2-small: measured 175 ms/op. */
  val airphantOpsPerSec: Double = 1000.0 / 175.0 // = 5.71 ops/s
  /** AIRPHANT VM (e2-small) monthly cost, USD. */
  val airphantVmMonthly: Double = 13.23
  /** AIRPHANT index+data storage overhead over the original data (Windows). */
  val airphantStorageFactor: Double = 1.008
  /** GCS storage, USD per GB-month. */
  val cloudStoragePerGbMonth: Double = 0.02

  /** Elasticsearch on e2-medium: measured 6.49 ms/op. */
  val elasticOpsPerSec: Double = 1000.0 / 6.49 // = 154.08 ops/s
  /** Elasticsearch VM (e2-medium) monthly cost, USD. */
  val elasticVmMonthly: Double = 26.46
  /** Elasticsearch storage (better compression): 0.3316 × S. */
  val elasticStorageFactor: Double = 0.3316
  /** Local persistent disk, USD per GB-month. */
  val localDiskPerGbMonth: Double = 0.2

  private val BytesPerGb = 1e9

  /** Monthly cost of AIRPHANT: VMs scale with the *current* workload
    * (elastic scale up/down), storage is cloud storage.
    */
  def airphantCost(aPeak: Double, aTrough: Double, tau: Double, sBytes: Double): Double = {
    require(tau >= 0 && tau <= 1 && aPeak >= 0 && aTrough >= 0 && sBytes >= 0)
    val meanServers = (aPeak * tau + aTrough * (1 - tau)) / airphantOpsPerSec
    meanServers * airphantVmMonthly +
      airphantStorageFactor * sBytes / BytesPerGb * cloudStoragePerGbMonth
  }

  /** Monthly cost of coupled Elasticsearch: must provision for the PEAK at
    * all times (it "cannot automatically scale down without rebalancing"),
    * with optimistically perfect linear sharding; storage on local disk.
    */
  def elasticCost(aPeak: Double, sBytes: Double): Double = {
    require(aPeak >= 0 && sBytes >= 0)
    (aPeak / elasticOpsPerSec) * elasticVmMonthly +
      elasticStorageFactor * sBytes / BytesPerGb * localDiskPerGbMonth
  }

  /** The relative cost C_E / C_A plotted in Fig. 9. */
  def relativeCost(aPeak: Double, aTrough: Double, tau: Double, sBytes: Double): Double =
    elasticCost(aPeak, sBytes) / airphantCost(aPeak, aTrough, tau, sBytes)

  /** lim_{N→∞} C_E/C_A — storage costs dominate; paper reports ≈ 3.29. */
  def storageAsymptote: Double =
    (elasticStorageFactor * localDiskPerGbMonth) /
      (airphantStorageFactor * cloudStoragePerGbMonth)

  /** Focusing on VM cost only, C_A/C_E = meanWorkload/(k · A) with the
    * paper's coefficient k ≈ 13.48: Airphant's VM spend beats ES's when
    * the mean workload is below A/13.48 (e.g. trough-dominated skews).
    */
  def vmCostCoefficient: Double =
    (airphantVmMonthly / airphantOpsPerSec) / (elasticVmMonthly / elasticOpsPerSec)
}

package repro.cluster

/** Hardware profile of a simulated cluster (paper §4.1).
  *
  * Only worker (slave) resources matter for executor packing; the master runs
  * the driver. Bandwidths are per-node aggregates.
  *
  * @param armRanges   true → parameters use Table 2 "Range A", else "Range B"
  * @param cpuFactor   relative per-core slowness (1.0 = reference)
  */
final case class ClusterProfile(
    name: String,
    workerNodes: Int,
    coresPerNode: Int,
    memGBPerNode: Int,
    diskMBpsPerNode: Double,
    netMBpsPerNode: Double,
    cpuFactor: Double,
    armRanges: Boolean,
) {
  def totalCores: Int = workerNodes * coresPerNode
  def totalMemGB: Int = workerNodes * memGBPerNode
}

object ClusterProfile {
  /** Four KUNPENG ARM servers: 1 master + 3 workers, 128 cores / 512 GB each. */
  val arm: ClusterProfile = ClusterProfile(
    name = "ARM-4node",
    workerNodes = 3, coresPerNode = 128, memGBPerNode = 512,
    diskMBpsPerNode = 2400.0, netMBpsPerNode = 2500.0,
    cpuFactor = 1.15, // KUNPENG 920 cores are a bit slower per-core than Xeon
    armRanges = true,
  )

  /** Eight Xeon servers: 1 master + 7 workers, 20 cores / 64 GB each. */
  val x86: ClusterProfile = ClusterProfile(
    name = "x86-8node",
    workerNodes = 7, coresPerNode = 20, memGBPerNode = 64,
    diskMBpsPerNode = 1600.0, netMBpsPerNode = 2000.0,
    cpuFactor = 1.0,
    armRanges = false,
  )
}

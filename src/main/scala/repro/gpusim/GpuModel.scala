package repro.gpusim

import repro.core.WorkProfile

/** Roofline-based execution model of the paper's GPU (NVIDIA Quadro RTX
  * 6000). No GPU exists in this environment, so GPU codecs execute their
  * algorithm on the CPU (bit-exact, so losslessness is really verified) and
  * their *timing* is derived from the work profile their hot loops report —
  * the same roofline reasoning the paper applies in §6.3.
  *
  * Kernel time = max(memory traffic / DRAM bandwidth,
  *                   scalar ops / achieved op rate x divergence penalty)
  *               + kernel launch overhead.
  * End-to-end time additionally pays PCIe host-to-device and device-to-host
  * copies — the paper's Observation 5 ("host-to-device is slow").
  */
object GpuModel {
  /** GDDR6 peak of the Quadro RTX 6000 (GB/s), derated to ~85% achievable. */
  val MemBandwidthBytesPerSec: Double = 672e9 * 0.85

  /** Achieved scalar integer op rate (ops/s). The card peaks at 16.3 TFLOP/s
    * FP32; dependent-chain integer bit manipulation typical of compression
    * kernels achieves a small fraction of peak — we calibrate to ~1 Top/s,
    * which reproduces the paper's GPU throughput ordering.
    */
  val OpRatePerSec: Double = 1.0e12

  /** Warp-serialization penalty for branch-divergent loops (LZ matching). */
  val DivergencePenalty: Double = 30.0

  /** Per-kernel launch overhead (s). Pipelined per-block launches amortize
    * to a small constant per compression call.
    */
  val KernelLaunchSec: Double = 2e-6

  /** PCIe 3.0 x16 effective bandwidth (bytes/s). */
  val PcieBytesPerSec: Double = 12e9

  /** Simulated on-device kernel time for one pass. */
  def kernelSeconds(work: WorkProfile): Double = {
    val memTime = work.traffic.toDouble / MemBandwidthBytesPerSec
    val penalty = if (work.divergent) DivergencePenalty else 1.0
    val opTime  = work.ops.toDouble * penalty / OpRatePerSec
    math.max(memTime, opTime) + KernelLaunchSec
  }

  /** PCIe transfer time for moving `bytes` across the host-device boundary. */
  def transferSeconds(bytes: Long): Double = bytes.toDouble / PcieBytesPerSec

  /** End-to-end seconds: H2D input copy + kernel + D2H output copy. */
  def endToEndSeconds(work: WorkProfile, inputBytes: Long, outputBytes: Long): Double =
    transferSeconds(inputBytes) + kernelSeconds(work) + transferSeconds(outputBytes)
}

package repro.gpusim

import repro.SparkSpec
import repro.core.WorkProfile

class GpuModelSpec extends SparkSpec {

  test("bandwidth-bound kernels scale with traffic") {
    val small = WorkProfile(1L << 20, 1L << 20, 100, divergent = false)
    val big   = WorkProfile(1L << 30, 1L << 30, 100, divergent = false)
    val ts = GpuModel.kernelSeconds(small)
    val tb = GpuModel.kernelSeconds(big)
    assert(tb > ts)
    // 1024x more traffic -> far more time, though the small kernel's cost is
    // dominated by launch overhead so the ratio stays below 1024
    assert(tb / ts > 100)
  }

  test("compute-bound kernels scale with ops") {
    val w = WorkProfile(1024, 1024, 1L << 40, divergent = false)
    val t = GpuModel.kernelSeconds(w)
    assert(math.abs(t - (1L << 40).toDouble / GpuModel.OpRatePerSec) < t * 0.01)
  }

  test("branch divergence slows a compute-bound kernel by the penalty") {
    val base = WorkProfile(1024, 1024, 1L << 36, divergent = false)
    val div  = base.copy(divergent = true)
    val r = GpuModel.kernelSeconds(div) / GpuModel.kernelSeconds(base)
    assert(math.abs(r - GpuModel.DivergencePenalty) < 0.5)
  }

  test("end-to-end adds PCIe transfers (Observation 5: host-to-device is slow)") {
    val w = WorkProfile(1L << 26, 1L << 26, 1000, divergent = false)
    val kernel = GpuModel.kernelSeconds(w)
    val e2e    = GpuModel.endToEndSeconds(w, 1L << 26, 1L << 25)
    assert(e2e > kernel * 5, s"PCIe must dominate: kernel=$kernel e2e=$e2e")
  }

  test("kernel launch overhead bounds tiny kernels") {
    val t = GpuModel.kernelSeconds(WorkProfile(8, 8, 8, divergent = false))
    assert(t >= GpuModel.KernelLaunchSec)
    assert(t < GpuModel.KernelLaunchSec * 1.01)
  }

  test("modeled GPU throughput is far above measured CPU range (Observation 3)") {
    // a bitcomp-like profile: ~2.2 bytes traffic and 3 ops per input byte
    val inputBytes = 1L << 30
    val w = WorkProfile(inputBytes, (inputBytes * 1.2).toLong, inputBytes * 3, divergent = false)
    val gbps = inputBytes.toDouble / GpuModel.kernelSeconds(w) / 1e9
    assert(gbps > 50, s"modeled $gbps GB/s")
  }

  test("work profile arithmetic") {
    val a = WorkProfile(10, 20, 30, divergent = false)
    val b = WorkProfile(1, 2, 3, divergent = true)
    val s = a + b
    assert(s == WorkProfile(11, 22, 33, divergent = true))
    assert(s.traffic == 33)
    assert(math.abs(a.arithmeticIntensity - 1.0) < 1e-9)
  }
}

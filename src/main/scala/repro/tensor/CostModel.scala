package repro.tensor

import OpClass._

/** Analytical device model for the simulated accelerators.
  *
  * The container has no GPU/TPU/browser, so accelerator timings (paper
  * Tables 1, 2, 3, 4 GPU columns) are *simulated*: kernels execute on the
  * host CPU for correctness while recording an op trace ([[Profile]]); the
  * trace is then re-timed as
  *
  *   time(op) = launchUs + bytes / (bandwidth · efficiency(opClass))
  *
  * This is the standard roofline-style model for memory-bound analytics
  * kernels (the paper notes TPC-H queries are memory-bound on GPU, §6.3).
  * Per-class efficiencies encode the paper's §6.5 observations: sorts,
  * `unique`, `nonzero` (host/device sync) and `scatter_add` are relatively
  * poor on GPU; element-wise streaming ops run at full bandwidth.
  *
  * Calibration constants are listed in EXPERIMENTS.md; they were chosen
  * once from public device specs, not tuned per query.
  */
final case class DeviceModel(
    name: String,
    /** Per-kernel launch/dispatch latency, microseconds. */
    launchUs: Double,
    /** Effective memory bandwidth, GB/s. */
    bwGBs: Double,
    /** Per-op-class efficiency in (0, 1]; lower = slower than streaming. */
    eff: Map[OpClass.Value, Double],
    /** Fixed per-query overhead (scheduling/allocation), milliseconds. */
    perQueryMs: Double = 0.0,
) {
  private def effOf(c: OpClass.Value): Double = eff.getOrElse(c, 1.0)

  /** Modeled execution time of one kernel, microseconds. */
  def opTimeUs(r: OpRecord): Double = {
    val bytesPerUs = bwGBs * 1000.0 * effOf(r.cls)
    launchUs + r.bytes / bytesPerUs
  }

  /** Modeled time of a whole op trace, milliseconds. */
  def timeMs(p: Profile): Double =
    perQueryMs + p.records.map(opTimeUs).sum / 1000.0
}

object DeviceModel {

  private val gpuEff = Map(
    ElementWise -> 1.0,
    Reduction   -> 0.7,
    Gather      -> 0.5,
    Materialize -> 0.45, // nonzero/masked_select need host/device sync (§6.5)
    Scatter     -> 0.18, // scatter_add GPU kernel "not optimal" (§6.5)
    Sort        -> 0.22,
    Unique      -> 0.25,
    Search      -> 0.6,
  )

  /** The paper's main GPU (Azure NC6s_v2). */
  val P100: DeviceModel = DeviceModel("NVIDIA P100", launchUs = 6.0, bwGBs = 732, gpuEff, perQueryMs = 1.2)
  val V100: DeviceModel = DeviceModel("NVIDIA V100", launchUs = 5.0, bwGBs = 900, gpuEff, perQueryMs = 1.0)
  val T4:   DeviceModel = DeviceModel("NVIDIA T4",   launchUs = 7.0, bwGBs = 320, gpuEff, perQueryMs = 1.4)
  val K80:  DeviceModel = DeviceModel("NVIDIA K80",  launchUs = 12.0, bwGBs = 240, gpuEff, perQueryMs = 2.5)

  /** PyTorch/XLA on TPU: decent bandwidth but high dispatch latency and no
    * fallback for unsupported ops (§6.9) — modeled as large launch cost.
    */
  val TPU: DeviceModel = DeviceModel("TPU (XLA)", launchUs = 90.0, bwGBs = 600, gpuEff, perQueryMs = 4.0)

  /** Integrated GPUs driven through TVM/Metal (§6.9, Table 4). */
  val IntelUHD630: DeviceModel =
    DeviceModel("Intel UHD Graphics 630", launchUs = 15.0, bwGBs = 25, gpuEff, perQueryMs = 3.0)
  val AMDRadeonPro5300M: DeviceModel =
    DeviceModel("AMD Radeon Pro 5300M", launchUs = 10.0, bwGBs = 96, gpuEff, perQueryMs = 2.0)

  /** ONNX Runtime on WebAssembly in Chrome (§6.9): interpretive, single
    * thread, tiny effective bandwidth.
    */
  val ChromeWasm: DeviceModel =
    DeviceModel("Chrome (ORT on WASM)", launchUs = 120.0, bwGBs = 1.1,
      Map(Sort -> 0.5, Unique -> 0.5), perQueryMs = 60.0)
}

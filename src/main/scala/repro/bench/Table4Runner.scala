package repro.bench

import org.apache.spark.sql.SparkSession
import repro.handopt.{HandOptMode, HandOptimized}
import repro.tensor._
import repro.tpch.TpchEnv

/** Table 4: portability — Q6 with the hand-optimized plan across hardware
  * and software backends. Each backend is a calibrated device model applied
  * to the op trace of the execution mode that targets it in the paper:
  * TVM-codegen traces for the integrated GPUs (TVM-on-Metal), interpreted
  * PyTorch traces for the discrete GPUs and the TPU (PyTorch / XLA), and
  * interpreted traces under the WASM model for the browser (ORT on WASM).
  */
object Table4Runner {

  final case class Entry(backend: String, stack: String, ms: Double)

  def run(spark: SparkSession, sf: Double): Seq[Entry] = {
    val tqp = TpchEnv.session(spark, sf)

    def trace(mode: HandOptMode): Profile = {
      val p = new Profile
      ExecCtx.withProfile(p) { HandOptimized.run("Q6", tqp, mode) }
      p
    }
    val tvmTrace   = trace(HandOptMode.Tvm)
    val torchTrace = trace(HandOptMode.Torch)

    Seq(
      Entry("Intel UHD Graphics 630", "TVM on Metal", DeviceModel.IntelUHD630.timeMs(tvmTrace)),
      Entry("AMD Radeon Pro 5300M",   "TVM on Metal", DeviceModel.AMDRadeonPro5300M.timeMs(tvmTrace)),
      Entry("NVIDIA K80",  "PyTorch",        DeviceModel.K80.timeMs(torchTrace)),
      Entry("NVIDIA V100", "PyTorch",        DeviceModel.V100.timeMs(torchTrace)),
      Entry("TPU",         "PyTorch on XLA", DeviceModel.TPU.timeMs(torchTrace)),
      Entry("Chrome",      "ORT on WASM",    DeviceModel.ChromeWasm.timeMs(torchTrace)),
    )
  }

  def print(entries: Seq[Entry], sf: Double): Unit =
    Measure.printTable(s"Table 4: TPC-H Q6 (hand-optimized) across backends (ms, simulated) at SF=$sf",
      Seq("Backend", "Stack", "Time (ms)"),
      entries.map(e => Seq(e.backend, e.stack, Measure.fmt(Some(e.ms)))))
}

package repro.engines

import repro.core.TqpSession
import repro.core.compile.CompiledIR
import repro.core.exec.TqpConfig
import repro.core.ops.JoinAlgo
import repro.tensor._

/** Simulated GPU engines (see DESIGN.md §2: no GPU exists in this
  * container). Every engine *really executes* its plan — on the host CPU,
  * with its own algorithmic configuration — while recording the kernel
  * trace; the reported time is the trace re-timed under the engine's device
  * model. The engines differ algorithmically the way the paper describes:
  *
  *  - TQP-GPU / TQPJ-GPU: TQP's own plans (sort join, sort aggregation),
  *    interpreted vs fused; P100 device model.
  *  - OmnisciSim: hash join + hash aggregation (the trait the paper credits
  *    for OmnisciDB's Q1/Q9 wins, §6.6), heavier per-query compilation.
  *  - BlazingSim: same relational algorithms but a less efficient kernel
  *    stack (RAPIDS-era overheads) — lower effective bandwidth, higher
  *    launch and per-query costs.
  *
  * Support matrices mirror Table 2: BlazingSQL runs 17/22 queries,
  * OmnisciDB 18/22, TQPJ lacks materialized views (Q15).
  */
object EngineSim {

  /** Queries each baseline cannot run (N/A cells of Table 2). */
  val blazingUnsupported: Set[String] = Set("Q11", "Q15", "Q16", "Q21", "Q22")
  val omnisciUnsupported: Set[String] = Set("Q14", "Q20", "Q21", "Q22")
  val tqpjUnsupported: Set[String]    = Set("Q15")

  final case class SimEngine(name: String, cfg: TqpConfig, model: DeviceModel,
                             unsupported: Set[String])

  val tqpGpu: SimEngine  = SimEngine("TQP (GPU)", TqpConfig.interpreted, DeviceModel.P100, Set.empty)
  val tqpjGpu: SimEngine = SimEngine("TQPJ (GPU)", TqpConfig.compiledMode, DeviceModel.P100, tqpjUnsupported)

  val omnisci: SimEngine = SimEngine(
    "OmnisciSim",
    TqpConfig(joinAlgo = JoinAlgo.Auto, hashAgg = true),
    // Same-class GPU, well-tuned hash kernels (Scatter/Gather near streaming),
    // but a heavyweight per-query JIT (§6: OmnisciDB compiles per query).
    // Per-query JIT overhead scaled to the SF=0.1 bench (a real OmnisciDB
    // compile takes tens of ms; at 1/10th the paper's data volume a fixed
    // 45ms would swamp every query — see EXPERIMENTS.md, calibration).
    DeviceModel("OmnisciDB-P100", launchUs = 4.0, bwGBs = 732,
      Map(OpClass.ElementWise -> 0.9, OpClass.Reduction -> 0.7, OpClass.Gather -> 0.6,
          OpClass.Materialize -> 0.6, OpClass.Scatter -> 0.75, OpClass.Sort -> 0.35,
          OpClass.Unique -> 0.4, OpClass.Search -> 0.6),
      perQueryMs = 4.5),
    omnisciUnsupported)

  val blazing: SimEngine = SimEngine(
    "BlazingSim",
    TqpConfig.interpreted,
    // RAPIDS kernel stack: lower effective bandwidth, costlier dispatch.
    DeviceModel("BlazingSQL-P100", launchUs = 25.0, bwGBs = 210,
      Map(OpClass.ElementWise -> 0.8, OpClass.Reduction -> 0.5, OpClass.Gather -> 0.4,
          OpClass.Materialize -> 0.35, OpClass.Scatter -> 0.3, OpClass.Sort -> 0.3,
          OpClass.Unique -> 0.3, OpClass.Search -> 0.5),
      perQueryMs = 6.0),
    blazingUnsupported)

  /** Execute `ir` under the engine's config, collecting the op trace, and
    * return the simulated device time in milliseconds (None if the engine
    * does not support the query).
    */
  def simulatedMs(tqp: TqpSession, queryName: String, ir: CompiledIR, engine: SimEngine,
                  device: CpuDevice = CpuDevice.single): Option[Double] = {
    if (engine.unsupported(queryName)) return None
    val profile = new Profile
    tqp.runOn(ir, engine.cfg, device, Some(profile))
    Some(engine.model.timeMs(profile))
  }
}

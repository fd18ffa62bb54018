package repro.tpch

import repro.SparkSpec
import repro.core.exec.TqpConfig
import repro.tensor.CpuDevice

/** Perf guard: the compiled (block-fused) mode must not be slower than the
  * interpreted mode on expression-heavy queries — the paper's TQPJ ≤ TQP
  * property (§6.1). Uses SF=0.05 to keep the suite quick but measurable.
  */
class TqpjPerfProbe extends SparkSpec {

  private val sf = 0.05

  test("TQPJ tracks or beats TQP on expression-heavy queries") {
    val tqp = TpchEnv.session(spark, sf)
    val queries = TpchQueries.all(sf).toMap
    val dev = CpuDevice.single
    // JIT warm-up: exercise both execution modes before any measurement so
    // the first measured query does not pay C2 compilation of the kernels.
    for (q <- Seq("Q6", "Q1"); cfg <- Seq(TqpConfig.interpreted, TqpConfig.compiledMode))
      tqp.runOn(tqp.compile(queries(q)), cfg, dev)
    for (name <- Seq("Q1", "Q6", "Q14", "Q19")) {
      val ir = tqp.compile(queries(name))
      def time(cfg: TqpConfig): Double = {
        tqp.runOn(ir, cfg, dev); tqp.runOn(ir, cfg, dev) // warm-up
        val runs = (0 until 3).map { _ =>
          val t0 = System.nanoTime(); tqp.runOn(ir, cfg, dev); (System.nanoTime() - t0) / 1e6
        }.sorted
        runs(1)
      }
      val interp = time(TqpConfig.interpreted)
      val fused  = time(TqpConfig.compiledMode)
      info(f"$name interp=$interp%.1f ms fused=$fused%.1f ms")
      assert(fused <= interp * 1.25, s"$name: fused $fused ms vs interp $interp ms")
    }
  }
}

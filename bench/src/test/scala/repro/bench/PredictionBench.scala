package repro.bench

import repro.SparkSpec

/** §6.7 reproduction: the mixed ML+SQL prediction query. Shape targets:
  * the unified tensor plan beats the Spark-style baseline on one core, the
  * simulated GPU run delivers the paper's headline end-to-end speedup, and
  * batch inference beats row-at-a-time inference.
  */
class PredictionBench extends SparkSpec {

  private val sf = 0.1

  test("Prediction query end-to-end") {
    val results = PredictionRunner.run(spark, sf)
    PredictionRunner.print(results, sf)

    def ms(e: String): Double = results.find(_.engine.startsWith(e)).get.ms
    // Paper: TQP ~40% faster than Spark on a single core.
    assert(ms("TQP (CPU, 1 core)") < ms("Spark-style"))
    // Paper: GPU end-to-end is the fastest configuration (9× over best CPU).
    assert(ms("TQP (GPU") < results.filterNot(_.engine.contains("GPU")).map(_.ms).min)
  }
}

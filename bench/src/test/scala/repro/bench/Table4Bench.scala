package repro.bench

import repro.SparkSpec

/** Table 4 reproduction: Q6 portability across simulated backends. The
  * assertion targets the paper's ordering: V100 < K80 < TPU < AMD iGPU <
  * Intel iGPU ≪ Chrome/WASM.
  */
class Table4Bench extends SparkSpec {

  private val sf = 0.1

  test("Table 4: Q6 across hardware/software backends") {
    val entries = Table4Runner.run(spark, sf)
    Table4Runner.print(entries, sf)

    def ms(b: String): Double = entries.find(_.backend == b).get.ms
    assert(ms("NVIDIA V100") < ms("NVIDIA K80"))
    assert(ms("NVIDIA K80") < ms("Intel UHD Graphics 630"))
    assert(ms("AMD Radeon Pro 5300M") < ms("Intel UHD Graphics 630"))
    assert(ms("NVIDIA V100") < ms("TPU"))
    assert(entries.map(_.ms).max == ms("Chrome"), "the browser backend is slowest")
  }
}

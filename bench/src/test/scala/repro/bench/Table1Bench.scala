package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 1 reproduction: bitmap vs host-control-flow filter. Shape
  * assertions mirror the paper's findings: the bitmap implementation wins
  * by orders of magnitude; compiling does not rescue the per-element loop;
  * loop execution on GPU is slower than on CPU (launch-bound).
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: filter over ~6M elements") {
    val results = Table1Runner.run()
    Table1Runner.print(results)

    val bitmap = results.find(_.impl == "Bitmap").get
    val python = results.find(_.impl == "Python").get

    // Paper: bitmap 36.6ms vs Python 23s on CPU (≈600×); ≥50× is the gate.
    assert(python.cpuTorchMs > 50 * bitmap.cpuTorchMs,
      s"loop ${python.cpuTorchMs}ms should be ≫ bitmap ${bitmap.cpuTorchMs}ms")
    // Paper: TorchScript does not help the Python loop (23s vs 22.7s).
    assert(python.cpuJitMs > 50 * bitmap.cpuJitMs)
    // Paper: GPU loop (200s) slower than CPU loop (23s).
    assert(python.gpuTorchMs > python.cpuTorchMs)
    // Paper: bitmap GPU (2.9ms) beats bitmap CPU (36.6ms).
    assert(bitmap.gpuTorchMs < bitmap.cpuTorchMs)
  }
}

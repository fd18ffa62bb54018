package repro.tensor

import org.scalatest.funsuite.AnyFunSuite

/** Device cost model sanity: the simulator must preserve the orderings the
  * reproduction relies on (bandwidth ordering, launch-bound small ops,
  * per-class efficiencies).
  */
class CostModelSpec extends AnyFunSuite {

  private def streamRecord(bytes: Long) = OpRecord("add", OpClass.ElementWise, bytes / 8, bytes)

  test("time grows linearly in bytes for streaming ops") {
    val m = DeviceModel.P100
    val t1 = m.opTimeUs(streamRecord(1L << 20))
    val t2 = m.opTimeUs(streamRecord(1L << 21))
    assert(t2 > t1)
    assert(math.abs((t2 - m.launchUs) / (t1 - m.launchUs) - 2.0) < 1e-6)
  }

  test("small kernels are launch-bound") {
    val m = DeviceModel.P100
    val t = m.opTimeUs(OpRecord("add", OpClass.ElementWise, 10, 80))
    assert(math.abs(t - m.launchUs) < 0.01)
  }

  test("bandwidth ordering: V100 > P100 > T4 > K80 for big streaming ops") {
    val r = streamRecord(1L << 30)
    val times = Seq(DeviceModel.V100, DeviceModel.P100, DeviceModel.T4, DeviceModel.K80).map(_.opTimeUs(r))
    assert(times == times.sorted)
  }

  test("sorts and scatters run below streaming efficiency on GPU") {
    val m = DeviceModel.P100
    val stream = m.opTimeUs(OpRecord("add", OpClass.ElementWise, 1 << 20, 8L << 20))
    val sort   = m.opTimeUs(OpRecord("sort", OpClass.Sort, 1 << 20, 8L << 20))
    val scat   = m.opTimeUs(OpRecord("scatterAdd", OpClass.Scatter, 1 << 20, 8L << 20))
    assert(sort > stream && scat > stream)
  }

  test("profile re-timing sums per-op model times plus per-query overhead") {
    val p = new Profile
    p.record("add", OpClass.ElementWise, 1000, 8000)
    p.record("sort", OpClass.Sort, 1000, 32000)
    val m = DeviceModel.P100
    val expect = m.perQueryMs + (m.opTimeUs(p.records(0)) + m.opTimeUs(p.records(1))) / 1000.0
    assert(math.abs(m.timeMs(p) - expect) < 1e-9)
  }

  test("timeByOpMs ranks by contribution") {
    val p = new Profile
    p.record("tiny", OpClass.ElementWise, 10, 80)
    p.record("huge", OpClass.Sort, 1 << 22, 1L << 30)
    val top = p.timeByOpMs(DeviceModel.P100).head
    assert(top._1 == "huge")
  }

  test("WASM model is orders of magnitude slower than discrete GPUs") {
    val r = streamRecord(64L << 20)
    assert(DeviceModel.ChromeWasm.opTimeUs(r) > 100 * DeviceModel.V100.opTimeUs(r))
  }
}

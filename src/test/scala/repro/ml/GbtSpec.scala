package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.tensor.F64Tensor

/** The GBT substrate: training reduces error, tensor (batch) inference
  * agrees with row-at-a-time inference, model shape matches the paper's
  * configuration.
  */
class GbtSpec extends AnyFunSuite {

  private def dataset(n: Int, seed: Int): (Array[Array[Double]], Array[Double]) = {
    val rnd = new scala.util.Random(seed)
    val f0 = Array.fill(n)(rnd.nextDouble() * 10)
    val f1 = Array.fill(n)(rnd.nextDouble() * 4 - 2)
    val f2 = Array.fill(n)(if (rnd.nextBoolean()) 1.0 else 0.0)
    val y  = Array.tabulate(n)(i => 2.0 * f0(i) - 3.0 * f1(i) * f1(i) + 5.0 * f2(i) + rnd.nextGaussian() * 0.1)
    (Array(f0, f1, f2), y)
  }

  private def mse(pred: Array[Double], y: Array[Double]): Double =
    pred.zip(y).map { case (p, t) => (p - t) * (p - t) }.sum / y.length

  test("boosting reduces training error monotonically with more trees") {
    val (x, y) = dataset(2000, 1)
    val m8  = Gbt.fit(x, y, nTrees = 8, depth = 4)
    val m64 = Gbt.fit(x, y, nTrees = 64, depth = 4)
    val p8  = m8.predict(x.map(F64Tensor(_))).data
    val p64 = m64.predict(x.map(F64Tensor(_))).data
    val base = mse(Array.fill(y.length)(y.sum / y.length), y)
    assert(mse(p8, y) < base, "8 trees must beat the mean predictor")
    assert(mse(p64, y) < mse(p8, y), "64 trees must beat 8 trees")
    assert(mse(p64, y) < 0.25 * base, "fit should explain most of the variance")
  }

  test("tensor inference equals row-at-a-time inference") {
    val (x, y) = dataset(500, 2)
    val m = Gbt.fit(x, y, nTrees = 16, depth = 5)
    val batch = m.predict(x.map(F64Tensor(_))).data
    val rows = Array.tabulate(y.length)(i => m.predictRow(Array(x(0)(i), x(1)(i), x(2)(i))))
    batch.zip(rows).foreach { case (b, r) => assert(math.abs(b - r) < 1e-9) }
  }

  test("model shape matches the requested configuration") {
    val (x, y) = dataset(200, 3)
    val m = Gbt.fit(x, y, nTrees = 12, depth = 6)
    assert(m.trees.length == 12)
    assert(m.trees.forall(_.depth == 6))
    assert(m.trees.forall(t => t.feature.length == (1 << 6) - 1 && t.leaf.length == (1 << 6)))
  }

  test("constant target fits exactly with zero trees' worth of correction") {
    val x = Array(Array.fill(100)(1.0))
    val y = Array.fill(100)(7.5)
    val m = Gbt.fit(x, y, nTrees = 3, depth = 2)
    val p = m.predict(x.map(F64Tensor(_))).data
    p.foreach(v => assert(math.abs(v - 7.5) < 1e-9))
  }
}

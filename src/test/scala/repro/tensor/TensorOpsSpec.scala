package repro.tensor

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the tensor runtime: each op is checked against a naive
  * Scala reference implementation over randomized inputs (the TCR substrate
  * must be right before anything built on it can be). Property-style checks
  * live in [[TensorProps]] (ScalaCheck).
  */
class TensorOpsSpec extends AnyFunSuite {

  private def randomLongs(seed: Int, n: Int): Array[Long] = {
    val r = new scala.util.Random(seed)
    Array.fill(n)(r.nextLong(2001) - 1000)
  }

  private def randomDoubles(seed: Int, n: Int): Array[Double] = {
    val r = new scala.util.Random(seed)
    Array.fill(n)((r.nextDouble() - 0.5) * 2e6)
  }

  private def trials(f: Int => Unit): Unit = Seq(0, 1, 2, 7, 100, 1023).foreach(f)

  test("arange") {
    assert(TensorOps.arange(5).data.toSeq == Seq(0L, 1L, 2L, 3L, 4L))
    assert(TensorOps.arange(0).data.isEmpty)
  }

  test("elementwise arithmetic matches reference") {
    trials { n =>
      val a = randomDoubles(n, n)
      val t = F64Tensor(a)
      assert(TensorOps.add(t, t).data.toSeq == a.map(x => x + x).toSeq)
      assert(TensorOps.mul(t, t).data.toSeq == a.map(x => x * x).toSeq)
      assert(TensorOps.sub(t, t).data.toSeq == a.map(_ => 0.0).toSeq)
    }
  }

  test("comparisons produce correct bitmaps") {
    trials { n =>
      val a = randomLongs(n, n)
      val t = I64Tensor(a)
      val z = I64Tensor.fill(a.length, 0L)
      assert(TensorOps.lt(t, z).data.toSeq == a.map(_ < 0L).toSeq)
      assert(TensorOps.ge(t, z).data.toSeq == a.map(_ >= 0L).toSeq)
      assert(TensorOps.eq(t, t).data.forall(identity))
    }
  }

  test("where selects per element") {
    val c = BoolTensor(Array(true, false, true))
    val a = F64Tensor(Array(1.0, 2.0, 3.0))
    val b = F64Tensor(Array(9.0, 8.0, 7.0))
    assert(TensorOps.where(c, a, b).data.toSeq == Seq(1.0, 8.0, 3.0))
  }

  test("nonzero / maskedSelect agree with filter") {
    trials { n =>
      val a = randomLongs(n + 31, n)
      val t = I64Tensor(a)
      val mask = TensorOps.gt(t, I64Tensor.fill(a.length, 10L))
      assert(TensorOps.maskedSelect(t, mask).data.toSeq == a.filter(_ > 10L).toSeq)
      val nz = TensorOps.nonzero(mask)
      assert(nz.data.map(i => a(i.toInt)).toSeq == a.filter(_ > 10L).toSeq)
    }
  }

  test("indexSelect gathers") {
    val t = F64Tensor(Array(10.0, 20.0, 30.0))
    assert(TensorOps.indexSelect(t, I64Tensor(Array(2L, 0L, 2L))).data.toSeq == Seq(30.0, 10.0, 30.0))
  }

  test("argsort is a stable ascending sort (longs)") {
    trials { n =>
      val a = randomLongs(n + 5, math.max(n, 3) * 7)
      val perm = TensorOps.argsort(I64Tensor(a))
      assert(perm.data.map(i => a(i.toInt)).toSeq == a.sorted.toSeq)
      perm.data.map(i => (a(i.toInt), i)).sliding(2).foreach {
        case Array((k1, i1), (k2, i2)) => if (k1 == k2) assert(i1 < i2)
        case _ =>
      }
    }
  }

  test("argsort doubles handles negatives and zeros") {
    trials { n =>
      val a = randomDoubles(n + 9, n * 3) ++ Array(0.0, -0.0, 1.0, -1.0)
      val perm = TensorOps.argsort(F64Tensor(a))
      assert(perm.data.map(i => a(i.toInt)).toSeq == a.sorted.toSeq)
    }
  }

  test("argsortDescending reverses order") {
    trials { n =>
      val a = randomLongs(n + 3, n * 2)
      val perm = TensorOps.argsortDescending(I64Tensor(a))
      assert(perm.data.map(i => a(i.toInt)).toSeq == a.sorted(Ordering[Long].reverse).toSeq)
    }
  }

  test("bincount counts occurrences") {
    val t = I64Tensor(Array(0L, 1L, 1L, 3L, 3L, 3L))
    assert(TensorOps.bincount(t, 5).data.toSeq == Seq(1L, 2L, 0L, 3L, 0L))
    assertThrows[IllegalArgumentException](TensorOps.bincount(I64Tensor(Array(5L)), 5))
  }

  test("cumsum is an inclusive prefix sum") {
    trials { n =>
      val a = randomLongs(n + 77, n)
      assert(TensorOps.cumsum(I64Tensor(a)).data.toSeq == a.scanLeft(0L)(_ + _).drop(1).toSeq)
    }
  }

  test("bucketize = count of boundaries <= v (binary search)") {
    val bounds = I64Tensor(Array(2L, 6L, 9L))
    val v      = I64Tensor(Array(0L, 2L, 5L, 6L, 8L, 9L, 100L))
    assert(TensorOps.bucketize(v, bounds).data.toSeq == Seq(0L, 1L, 1L, 2L, 2L, 3L, 3L))
  }

  test("uniqueConsecutive: uniques, inverse, counts") {
    val (u, inv, c) = TensorOps.uniqueConsecutive(I64Tensor(Array(4L, 4L, 7L, 1L, 1L, 1L)))
    assert(u.data.toSeq == Seq(4L, 7L, 1L))
    assert(inv.data.toSeq == Seq(0L, 0L, 1L, 2L, 2L, 2L))
    assert(c.data.toSeq == Seq(2L, 1L, 3L))
    val (u0, inv0, c0) = TensorOps.uniqueConsecutive(I64Tensor(Array.empty))
    assert(u0.length == 0 && inv0.length == 0 && c0.length == 0)
  }

  test("scatterAdd reduces by segment") {
    val v = F64Tensor(Array(1.0, 2.0, 3.0, 4.0))
    val s = I64Tensor(Array(0L, 1L, 0L, 1L))
    assert(TensorOps.scatterAdd(v, s, 2).data.toSeq == Seq(4.0, 6.0))
  }

  test("scatterMin / scatterMax") {
    val v = F64Tensor(Array(5.0, -2.0, 3.0, 9.0))
    val s = I64Tensor(Array(0L, 0L, 1L, 1L))
    assert(TensorOps.scatterMin(v, s, 2).data.toSeq == Seq(-2.0, 3.0))
    assert(TensorOps.scatterMax(v, s, 2).data.toSeq == Seq(5.0, 9.0))
  }

  test("scatterOverwrite: last write wins") {
    val t = TensorOps.scatterOverwrite(I64Tensor.fill(4, -1L),
      I64Tensor(Array(1L, 2L, 1L)), I64Tensor(Array(10L, 20L, 30L)))
    assert(t.data.toSeq == Seq(-1L, 30L, 20L, -1L))
  }

  test("reductions") {
    val t = F64Tensor(Array(1.5, -2.5, 4.0))
    assert(TensorOps.sum(t) == 3.0)
    assert(TensorOps.min(t) == -2.5 && TensorOps.max(t) == 4.0)
    val l = I64Tensor(Array(3L, 9L, -1L))
    assert(TensorOps.sum(l) == 11L && TensorOps.min(l) == -1L && TensorOps.max(l) == 9L)
    assert(TensorOps.any(BoolTensor(Array(false, true))))
    assert(!TensorOps.all(BoolTensor(Array(false, true))))
  }

  test("cat concatenates") {
    assert(TensorOps.cat(I64Tensor(Array(1L)), I64Tensor(Array(2L, 3L))).data.toSeq == Seq(1L, 2L, 3L))
  }

  test("floorDiv / remainder match Math.floor semantics") {
    val a = I64Tensor(Array(7L, -7L, 9L))
    val b = I64Tensor(Array(2L, 2L, 3L))
    assert(TensorOps.floorDiv(a, b).data.toSeq == Seq(3L, -4L, 3L))
    assert(TensorOps.remainder(a, b).data.toSeq == Seq(1L, 1L, 0L))
    assert(TensorOps.remainder(I64Tensor(Array(-3L)), 5L).data.toSeq == Seq(2L))
  }

  test("parallel device produces identical results to single-threaded") {
    val dev = new CpuDevice(6)
    try {
      val a = Array.tabulate(300000)(i => (i * 2654435761L) % 997 - 500.0)
      val single = TensorOps.mul(F64Tensor(a), F64Tensor(a)).data
      val multi = ExecCtx.withDevice(dev) { TensorOps.mul(F64Tensor(a), F64Tensor(a)).data }
      assert(java.util.Arrays.equals(single, multi))
      val sSum = TensorOps.sum(F64Tensor(a))
      val mSum = ExecCtx.withDevice(dev) { TensorOps.sum(F64Tensor(a)) }
      assert(math.abs(sSum - mSum) < 1e-6 * math.max(math.abs(sSum), 1.0))
    } finally dev.close()
  }

  test("profile records op classes and bytes") {
    val p = new Profile
    ExecCtx.withProfile(p) {
      val t = F64Tensor(Array.fill(1000)(1.0))
      TensorOps.add(t, t)
      TensorOps.argsort(t)
    }
    val names = p.records.map(_.name)
    assert(names.contains("add") && names.contains("sort"))
    assert(p.totalBytes > 0)
    assert(p.byClass.contains(OpClass.Sort))
  }
}

package repro.tensor

import OpClass._

/** The tensor operation surface of the reproduction's TCR.
  *
  * Op names and semantics mirror the PyTorch operations the paper lists in
  * §2.2 (creation, indexing/slicing, reorganization, comparison, arithmetic,
  * join/concat, reduction). Relational operators (§5) are written purely in
  * terms of these ops — the reproduction's analogue of the paper's DC3
  * ("adhere to the TCR API, add no custom operators").
  *
  * Every op: (1) runs its kernel chunk-parallel on the current
  * [[ExecCtx]] device where the class allows it, and (2) records an
  * [[OpRecord]] to the current profile for the simulated-device cost models.
  */
object TensorOps {

  // ------------------------------------------------------------------
  // Creation
  // ------------------------------------------------------------------

  /** `torch.arange(n)` — 0..n-1. */
  def arange(n: Int): I64Tensor = {
    val a = new Array[Long](n)
    ExecCtx.current.device.parallelRanges(n) { (s, e) =>
      var i = s; while (i < e) { a(i) = i; i += 1 }
    }
    Profile.rec("arange", ElementWise, n, n * 8L)
    I64Tensor(a)
  }

  // ------------------------------------------------------------------
  // Element-wise arithmetic
  // ------------------------------------------------------------------

  private def zipF64(name: String, a: Array[Double], b: Array[Double])(f: (Double, Double) => Double): F64Tensor = {
    require(a.length == b.length, s"$name: length mismatch ${a.length} vs ${b.length}")
    val out = new Array[Double](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = f(a(i), b(i)); i += 1 }
    }
    Profile.rec(name, ElementWise, a.length, a.length * 24L)
    F64Tensor(out)
  }

  private def zipI64(name: String, a: Array[Long], b: Array[Long])(f: (Long, Long) => Long): I64Tensor = {
    require(a.length == b.length, s"$name: length mismatch ${a.length} vs ${b.length}")
    val out = new Array[Long](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = f(a(i), b(i)); i += 1 }
    }
    Profile.rec(name, ElementWise, a.length, a.length * 24L)
    I64Tensor(out)
  }

  def add(a: F64Tensor, b: F64Tensor): F64Tensor = zipF64("add", a.data, b.data)(_ + _)
  def sub(a: F64Tensor, b: F64Tensor): F64Tensor = zipF64("sub", a.data, b.data)(_ - _)
  def mul(a: F64Tensor, b: F64Tensor): F64Tensor = zipF64("mul", a.data, b.data)(_ * _)
  def div(a: F64Tensor, b: F64Tensor): F64Tensor = zipF64("div", a.data, b.data)(_ / _)

  def add(a: I64Tensor, b: I64Tensor): I64Tensor = zipI64("add", a.data, b.data)(_ + _)
  def sub(a: I64Tensor, b: I64Tensor): I64Tensor = zipI64("sub", a.data, b.data)(_ - _)
  def mul(a: I64Tensor, b: I64Tensor): I64Tensor = zipI64("mul", a.data, b.data)(_ * _)
  def remainder(a: I64Tensor, m: Long): I64Tensor = {
    val out = new Array[Long](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { val r = a.data(i) % m; out(i) = if (r < 0) r + m else r; i += 1 }
    }
    Profile.rec("remainder", ElementWise, a.length, a.length * 16L)
    I64Tensor(out)
  }
  /** Integer floor division (used by Algorithm 1, line 13). */
  def floorDiv(a: I64Tensor, b: I64Tensor): I64Tensor = zipI64("floorDiv", a.data, b.data)(Math.floorDiv)
  /** Element-wise remainder (Algorithm 1, line 14). */
  def remainder(a: I64Tensor, b: I64Tensor): I64Tensor = zipI64("remainder", a.data, b.data)(Math.floorMod)

  def addScalar(a: F64Tensor, v: Double): F64Tensor = {
    val out = new Array[Double](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i) + v; i += 1 }
    }
    Profile.rec("addScalar", ElementWise, a.length, a.length * 16L)
    F64Tensor(out)
  }

  def neg(a: F64Tensor): F64Tensor = {
    val out = new Array[Double](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = -a.data(i); i += 1 }
    }
    Profile.rec("neg", ElementWise, a.length, a.length * 16L)
    F64Tensor(out)
  }

  def toF64(a: I64Tensor): F64Tensor = {
    val out = new Array[Double](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i).toDouble; i += 1 }
    }
    Profile.rec("cast", ElementWise, a.length, a.length * 16L)
    F64Tensor(out)
  }

  def toI64(a: F64Tensor): I64Tensor = {
    val out = new Array[Long](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i).toLong; i += 1 }
    }
    Profile.rec("cast", ElementWise, a.length, a.length * 16L)
    I64Tensor(out)
  }

  // ------------------------------------------------------------------
  // Comparison → boolean bitmaps (the paper's filter representation, §3.1)
  // ------------------------------------------------------------------

  private def cmpF64(name: String, a: Array[Double], b: Array[Double])(f: (Double, Double) => Boolean): BoolTensor = {
    require(a.length == b.length, s"$name: length mismatch")
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = f(a(i), b(i)); i += 1 }
    }
    Profile.rec(name, ElementWise, a.length, a.length * 17L)
    BoolTensor(out)
  }

  private def cmpI64(name: String, a: Array[Long], b: Array[Long])(f: (Long, Long) => Boolean): BoolTensor = {
    require(a.length == b.length, s"$name: length mismatch")
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = f(a(i), b(i)); i += 1 }
    }
    Profile.rec(name, ElementWise, a.length, a.length * 17L)
    BoolTensor(out)
  }

  def lt(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("lt", a.data, b.data)(_ < _)
  def le(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("le", a.data, b.data)(_ <= _)
  def gt(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("gt", a.data, b.data)(_ > _)
  def ge(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("ge", a.data, b.data)(_ >= _)
  def eq(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("eq", a.data, b.data)(_ == _)
  def ne(a: F64Tensor, b: F64Tensor): BoolTensor = cmpF64("ne", a.data, b.data)(_ != _)

  def lt(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("lt", a.data, b.data)(_ < _)
  def le(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("le", a.data, b.data)(_ <= _)
  def gt(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("gt", a.data, b.data)(_ > _)
  def ge(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("ge", a.data, b.data)(_ >= _)
  def eq(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("eq", a.data, b.data)(_ == _)
  def ne(a: I64Tensor, b: I64Tensor): BoolTensor = cmpI64("ne", a.data, b.data)(_ != _)

  def ltScalar(a: F64Tensor, v: Double): BoolTensor = {
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i) < v; i += 1 }
    }
    Profile.rec("lt", ElementWise, a.length, a.length * 9L)
    BoolTensor(out)
  }

  /** Membership in a small constant set (the paper's IN support). */
  def isin(a: I64Tensor, values: Array[Long]): BoolTensor = {
    val set = values.toSet
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = set.contains(a.data(i)); i += 1 }
    }
    Profile.rec("isin", ElementWise, a.length, a.length * 9L)
    BoolTensor(out)
  }

  // ------------------------------------------------------------------
  // Logical
  // ------------------------------------------------------------------

  def logicalAnd(a: BoolTensor, b: BoolTensor): BoolTensor = {
    require(a.length == b.length, "logicalAnd: length mismatch")
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i) && b.data(i); i += 1 }
    }
    Profile.rec("logicalAnd", ElementWise, a.length, a.length * 3L)
    BoolTensor(out)
  }

  def logicalOr(a: BoolTensor, b: BoolTensor): BoolTensor = {
    require(a.length == b.length, "logicalOr: length mismatch")
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(i) || b.data(i); i += 1 }
    }
    Profile.rec("logicalOr", ElementWise, a.length, a.length * 3L)
    BoolTensor(out)
  }

  def logicalNot(a: BoolTensor): BoolTensor = {
    val out = new Array[Boolean](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = !a.data(i); i += 1 }
    }
    Profile.rec("logicalNot", ElementWise, a.length, a.length * 2L)
    BoolTensor(out)
  }

  /** `torch.where(cond, a, b)` for doubles. */
  def where(cond: BoolTensor, a: F64Tensor, b: F64Tensor): F64Tensor = {
    require(cond.length == a.length && a.length == b.length, "where: length mismatch")
    val out = new Array[Double](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = if (cond.data(i)) a.data(i) else b.data(i); i += 1 }
    }
    Profile.rec("where", ElementWise, a.length, a.length * 25L)
    F64Tensor(out)
  }

  def where(cond: BoolTensor, a: I64Tensor, b: I64Tensor): I64Tensor = {
    require(cond.length == a.length && a.length == b.length, "where: length mismatch")
    val out = new Array[Long](a.length)
    ExecCtx.current.device.parallelRanges(a.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = if (cond.data(i)) a.data(i) else b.data(i); i += 1 }
    }
    Profile.rec("where", ElementWise, a.length, a.length * 25L)
    I64Tensor(out)
  }

  // ------------------------------------------------------------------
  // Indexing / selection
  // ------------------------------------------------------------------

  /** `torch.nonzero` — selection-vector form of a bitmap (§3.1). */
  def nonzero(mask: BoolTensor): I64Tensor = {
    val n = mask.length
    var c = 0
    var i = 0
    while (i < n) { if (mask.data(i)) c += 1; i += 1 }
    val out = new Array[Long](c)
    var j = 0; i = 0
    while (i < n) { if (mask.data(i)) { out(j) = i; j += 1 }; i += 1 }
    Profile.rec("nonzero", Materialize, n, n * 1L + c * 8L)
    I64Tensor(out)
  }

  def maskedSelect(a: F64Tensor, mask: BoolTensor): F64Tensor = {
    require(a.length == mask.length, "maskedSelect: length mismatch")
    val idx = countTrue(mask)
    val out = new Array[Double](idx)
    var i = 0; var j = 0
    while (i < a.length) { if (mask.data(i)) { out(j) = a.data(i); j += 1 }; i += 1 }
    Profile.rec("maskedSelect", Materialize, a.length, a.length * 9L + idx * 8L)
    F64Tensor(out)
  }

  def maskedSelect(a: I64Tensor, mask: BoolTensor): I64Tensor = {
    require(a.length == mask.length, "maskedSelect: length mismatch")
    val idx = countTrue(mask)
    val out = new Array[Long](idx)
    var i = 0; var j = 0
    while (i < a.length) { if (mask.data(i)) { out(j) = a.data(i); j += 1 }; i += 1 }
    Profile.rec("maskedSelect", Materialize, a.length, a.length * 9L + idx * 8L)
    I64Tensor(out)
  }

  private def countTrue(mask: BoolTensor): Int = {
    var c = 0; var i = 0
    while (i < mask.length) { if (mask.data(i)) c += 1; i += 1 }
    c
  }

  /** `torch.index_select` / gather along dim 0. */
  def indexSelect(a: F64Tensor, idx: I64Tensor): F64Tensor = {
    val out = new Array[Double](idx.length)
    ExecCtx.current.device.parallelRanges(idx.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(idx.data(i).toInt); i += 1 }
    }
    Profile.rec("indexSelect", Gather, idx.length, idx.length * 24L)
    F64Tensor(out)
  }

  def indexSelect(a: I64Tensor, idx: I64Tensor): I64Tensor = {
    val out = new Array[Long](idx.length)
    ExecCtx.current.device.parallelRanges(idx.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(idx.data(i).toInt); i += 1 }
    }
    Profile.rec("indexSelect", Gather, idx.length, idx.length * 24L)
    I64Tensor(out)
  }

  def indexSelect(a: BoolTensor, idx: I64Tensor): BoolTensor = {
    val out = new Array[Boolean](idx.length)
    ExecCtx.current.device.parallelRanges(idx.length) { (s, e) =>
      var i = s; while (i < e) { out(i) = a.data(idx.data(i).toInt); i += 1 }
    }
    Profile.rec("indexSelect", Gather, idx.length, idx.length * 10L)
    BoolTensor(out)
  }

  /** Slice `[from, until)` — `torch.narrow`. */
  def narrow(a: I64Tensor, from: Int, until: Int): I64Tensor = {
    Profile.rec("narrow", Materialize, until - from, (until - from) * 8L)
    I64Tensor(java.util.Arrays.copyOfRange(a.data, from, until))
  }

  def narrow(a: F64Tensor, from: Int, until: Int): F64Tensor = {
    Profile.rec("narrow", Materialize, until - from, (until - from) * 8L)
    F64Tensor(java.util.Arrays.copyOfRange(a.data, from, until))
  }

  // ------------------------------------------------------------------
  // Concatenation (the paper's "Join" tensor-op category)
  // ------------------------------------------------------------------

  def cat(a: I64Tensor, b: I64Tensor): I64Tensor = {
    val out = new Array[Long](a.length + b.length)
    System.arraycopy(a.data, 0, out, 0, a.length)
    System.arraycopy(b.data, 0, out, a.length, b.length)
    Profile.rec("cat", Materialize, out.length, out.length * 16L)
    I64Tensor(out)
  }

  def cat(a: F64Tensor, b: F64Tensor): F64Tensor = {
    val out = new Array[Double](a.length + b.length)
    System.arraycopy(a.data, 0, out, 0, a.length)
    System.arraycopy(b.data, 0, out, a.length, b.length)
    Profile.rec("cat", Materialize, out.length, out.length * 16L)
    F64Tensor(out)
  }

  // ------------------------------------------------------------------
  // Sort (radix argsort — the paper's aggregation uses radix sort, §5.4)
  // ------------------------------------------------------------------

  /** Stable ascending argsort of signed longs; returns the permutation. */
  def argsort(keys: I64Tensor): I64Tensor = {
    Profile.rec("sort", Sort, keys.length, keys.length * 16L * 4L)
    I64Tensor(RadixSort.argsortLong(keys.data, descending = false))
  }

  def argsortDescending(keys: I64Tensor): I64Tensor = {
    Profile.rec("sort", Sort, keys.length, keys.length * 16L * 4L)
    I64Tensor(RadixSort.argsortLong(keys.data, descending = true))
  }

  /** Stable ascending argsort of doubles (IEEE total order). */
  def argsort(keys: F64Tensor): I64Tensor = {
    Profile.rec("sort", Sort, keys.length, keys.length * 16L * 4L)
    I64Tensor(RadixSort.argsortDouble(keys.data, descending = false))
  }

  def argsortDescending(keys: F64Tensor): I64Tensor = {
    Profile.rec("sort", Sort, keys.length, keys.length * 16L * 4L)
    I64Tensor(RadixSort.argsortDouble(keys.data, descending = true))
  }

  /** `torch.sort` — returns (sortedValues, argsortIndices). */
  def sort(keys: I64Tensor): (I64Tensor, I64Tensor) = {
    val idx = argsort(keys)
    (indexSelect(keys, idx), idx)
  }

  // ------------------------------------------------------------------
  // Histograms / prefix sums / search (the sort-join toolkit, Alg. 1)
  // ------------------------------------------------------------------

  /** `torch.bincount` — values must be in `[0, minLength)` or smaller. */
  def bincount(a: I64Tensor, minLength: Int): I64Tensor = {
    val out = new Array[Long](minLength)
    var i = 0
    while (i < a.length) {
      val v = a.data(i).toInt
      require(v >= 0 && v < minLength, s"bincount: value $v out of [0, $minLength)")
      out(v) += 1
      i += 1
    }
    Profile.rec("bincount", Scatter, a.length, a.length * 8L + minLength * 8L)
    I64Tensor(out)
  }

  /** `torch.cumsum(dim=0)` — inclusive prefix sum. */
  def cumsum(a: I64Tensor): I64Tensor = {
    val out = new Array[Long](a.length)
    var acc = 0L; var i = 0
    while (i < a.length) { acc += a.data(i); out(i) = acc; i += 1 }
    Profile.rec("cumsum", Reduction, a.length, a.length * 16L)
    I64Tensor(out)
  }

  /** `torch.bucketize(v, boundaries)` (right=True): count of boundaries <= v,
    * i.e. index of the first boundary strictly greater than v. Parallel
    * binary search per element — Alg. 1 line 11.
    */
  def bucketize(values: I64Tensor, boundaries: I64Tensor): I64Tensor = {
    val out = new Array[Long](values.length)
    val b = boundaries.data
    ExecCtx.current.device.parallelRanges(values.length) { (s, e) =>
      var i = s
      while (i < e) {
        val v = values.data(i)
        var lo = 0; var hi = b.length
        while (lo < hi) {
          val mid = (lo + hi) >>> 1
          if (b(mid) <= v) lo = mid + 1 else hi = mid
        }
        out(i) = lo
        i += 1
      }
    }
    val logB = math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(math.max(1L, b.length.toLong)))
    Profile.rec("bucketize", Search, values.length, values.length.toLong * 8L * logB)
    I64Tensor(out)
  }

  // ------------------------------------------------------------------
  // Unique (aggregation toolkit, Alg. 3)
  // ------------------------------------------------------------------

  /** `torch.unique_consecutive(return_inverse=True, return_counts=True)`.
    * Single-threaded by design — mirrors PyTorch's CPU implementation, the
    * scaling bottleneck the paper calls out in §6.3.
    */
  def uniqueConsecutive(a: I64Tensor): (I64Tensor, I64Tensor, I64Tensor) = {
    val n = a.length
    if (n == 0) return (I64Tensor(Array.empty), I64Tensor(Array.empty), I64Tensor(Array.empty))
    val inv = new Array[Long](n)
    var nU = 1
    var i = 1
    while (i < n) { if (a.data(i) != a.data(i - 1)) nU += 1; i += 1 }
    val uniq   = new Array[Long](nU)
    val counts = new Array[Long](nU)
    uniq(0) = a.data(0); counts(0) = 1; inv(0) = 0
    var u = 0; i = 1
    while (i < n) {
      if (a.data(i) != a.data(i - 1)) { u += 1; uniq(u) = a.data(i) }
      counts(u) += 1
      inv(i) = u
      i += 1
    }
    Profile.rec("uniqueConsecutive", Unique, n, n * 24L)
    (I64Tensor(uniq), I64Tensor(inv), I64Tensor(counts))
  }

  // ------------------------------------------------------------------
  // Scatter reductions (grouped aggregates: scatter_add / min / max)
  // ------------------------------------------------------------------

  def scatterAdd(values: F64Tensor, segIds: I64Tensor, nSeg: Int): F64Tensor = {
    require(values.length == segIds.length, "scatterAdd: length mismatch")
    val out = new Array[Double](nSeg)
    var i = 0
    while (i < values.length) { out(segIds.data(i).toInt) += values.data(i); i += 1 }
    Profile.rec("scatterAdd", Scatter, values.length, values.length * 24L)
    F64Tensor(out)
  }

  def scatterAdd(values: I64Tensor, segIds: I64Tensor, nSeg: Int): I64Tensor = {
    require(values.length == segIds.length, "scatterAdd: length mismatch")
    val out = new Array[Long](nSeg)
    var i = 0
    while (i < values.length) { out(segIds.data(i).toInt) += values.data(i); i += 1 }
    Profile.rec("scatterAdd", Scatter, values.length, values.length * 24L)
    I64Tensor(out)
  }

  def scatterMin(values: F64Tensor, segIds: I64Tensor, nSeg: Int): F64Tensor = {
    val out = F64Tensor.fill(nSeg, Double.PositiveInfinity).data
    var i = 0
    while (i < values.length) {
      val s = segIds.data(i).toInt
      if (values.data(i) < out(s)) out(s) = values.data(i)
      i += 1
    }
    Profile.rec("scatterMin", Scatter, values.length, values.length * 24L)
    F64Tensor(out)
  }

  def scatterMax(values: F64Tensor, segIds: I64Tensor, nSeg: Int): F64Tensor = {
    val out = F64Tensor.fill(nSeg, Double.NegativeInfinity).data
    var i = 0
    while (i < values.length) {
      val s = segIds.data(i).toInt
      if (values.data(i) > out(s)) out(s) = values.data(i)
      i += 1
    }
    Profile.rec("scatterMax", Scatter, values.length, values.length * 24L)
    F64Tensor(out)
  }

  def scatterMin(values: I64Tensor, segIds: I64Tensor, nSeg: Int): I64Tensor = {
    val out = I64Tensor.fill(nSeg, Long.MaxValue).data
    var i = 0
    while (i < values.length) {
      val s = segIds.data(i).toInt
      if (values.data(i) < out(s)) out(s) = values.data(i)
      i += 1
    }
    Profile.rec("scatterMin", Scatter, values.length, values.length * 24L)
    I64Tensor(out)
  }

  def scatterMax(values: I64Tensor, segIds: I64Tensor, nSeg: Int): I64Tensor = {
    val out = I64Tensor.fill(nSeg, Long.MinValue).data
    var i = 0
    while (i < values.length) {
      val s = segIds.data(i).toInt
      if (values.data(i) > out(s)) out(s) = values.data(i)
      i += 1
    }
    Profile.rec("scatterMax", Scatter, values.length, values.length * 24L)
    I64Tensor(out)
  }

  /** `scatter_` with overwrite semantics (last write wins) — the hash-table
    * build primitive of Algorithm 2 line 8.
    */
  def scatterOverwrite(target: I64Tensor, index: I64Tensor, src: I64Tensor): I64Tensor = {
    require(index.length == src.length, "scatterOverwrite: length mismatch")
    val out = target.data.clone()
    var i = 0
    while (i < index.length) { out(index.data(i).toInt) = src.data(i); i += 1 }
    Profile.rec("scatter", Scatter, index.length, index.length * 24L)
    I64Tensor(out)
  }

  // ------------------------------------------------------------------
  // Global reductions
  // ------------------------------------------------------------------

  def sum(a: F64Tensor): Double = {
    val dev = ExecCtx.current.device
    Profile.rec("sum", Reduction, a.length, a.length * 8L)
    if (dev.threads == 1 || a.length < 65536) {
      var acc = 0.0; var i = 0
      while (i < a.length) { acc += a.data(i); i += 1 }
      acc
    } else {
      val parts = new java.util.concurrent.ConcurrentLinkedQueue[java.lang.Double]()
      dev.parallelRanges(a.length) { (s, e) =>
        var acc = 0.0; var i = s
        while (i < e) { acc += a.data(i); i += 1 }
        parts.add(acc)
      }
      var acc = 0.0
      parts.forEach(d => acc += d)
      acc
    }
  }

  def sum(a: I64Tensor): Long = {
    Profile.rec("sum", Reduction, a.length, a.length * 8L)
    var acc = 0L; var i = 0
    while (i < a.length) { acc += a.data(i); i += 1 }
    acc
  }

  def max(a: I64Tensor): Long = {
    require(a.length > 0, "max of empty tensor")
    Profile.rec("max", Reduction, a.length, a.length * 8L)
    var m = Long.MinValue; var i = 0
    while (i < a.length) { if (a.data(i) > m) m = a.data(i); i += 1 }
    m
  }

  def min(a: I64Tensor): Long = {
    require(a.length > 0, "min of empty tensor")
    Profile.rec("min", Reduction, a.length, a.length * 8L)
    var m = Long.MaxValue; var i = 0
    while (i < a.length) { if (a.data(i) < m) m = a.data(i); i += 1 }
    m
  }

  def max(a: F64Tensor): Double = {
    require(a.length > 0, "max of empty tensor")
    Profile.rec("max", Reduction, a.length, a.length * 8L)
    var m = Double.NegativeInfinity; var i = 0
    while (i < a.length) { if (a.data(i) > m) m = a.data(i); i += 1 }
    m
  }

  def min(a: F64Tensor): Double = {
    require(a.length > 0, "min of empty tensor")
    Profile.rec("min", Reduction, a.length, a.length * 8L)
    var m = Double.PositiveInfinity; var i = 0
    while (i < a.length) { if (a.data(i) < m) m = a.data(i); i += 1 }
    m
  }

  def any(a: BoolTensor): Boolean = {
    Profile.rec("any", Reduction, a.length, a.length * 1L)
    var i = 0
    while (i < a.length) { if (a.data(i)) return true; i += 1 }
    false
  }

  def all(a: BoolTensor): Boolean = {
    Profile.rec("all", Reduction, a.length, a.length * 1L)
    var i = 0
    while (i < a.length) { if (!a.data(i)) return false; i += 1 }
    true
  }
}

package repro.handopt

import repro.core.TqpSession
import repro.core.data.{Column, DType, TensorTable}
import repro.tensor._

/** Hand-optimized tensor programs for Q1, Q6, Q9, Q14 (§6.6) — what a
  * TCR-aware optimizer with cardinality knowledge would emit:
  *
  *  - shared subexpressions computed once (Q1's `ep*(1-disc)` feeds both
  *    `sum_disc_price` and `sum_charge`);
  *  - sorts avoided entirely: group keys with tiny/dense domains are
  *    scatter-aggregated directly (Q1, Q9);
  *  - joins whose payload is only an existence test become semi filters
  *    (Q9 ⋈ part), and joins against dense primary keys become direct
  *    gathers (Q9 ⋈ supplier/orders/nation);
  *  - better join algorithm choice (hash instead of sort, Q14, Q9).
  *
  * Three execution modes mirror Table 3: Torch (composed tensor ops, one
  * intermediate per op), Jit (fused expression kernels, TorchScript-style),
  * Tvm (whole-operator code generation: one loop, zero intermediates —
  * available only for Q6 and Q14, as in the paper).
  */
sealed trait HandOptMode
object HandOptMode {
  case object Torch extends HandOptMode
  case object Jit   extends HandOptMode
  case object Tvm   extends HandOptMode
}

object HandOptimized {
  import HandOptMode._

  private def day(s: String): Long = java.time.LocalDate.parse(s).toEpochDay

  def supported(query: String, mode: HandOptMode): Boolean = (query, mode) match {
    case ("Q1" | "Q9", Tvm) => false
    case ("Q1" | "Q6" | "Q9" | "Q14", _) => true
    case _ => false
  }

  def run(query: String, tqp: TqpSession, mode: HandOptMode): TensorTable = query match {
    case "Q1"  => q1(tqp, mode)
    case "Q6"  => q6(tqp, mode)
    case "Q9"  => q9(tqp, mode)
    case "Q14" => q14(tqp, mode)
    case other => throw new IllegalArgumentException(s"no hand-optimized plan for $other")
  }

  // ------------------------------------------------------------------
  // Q6 — predicate + sum. Torch: bitmap & masked_select composition.
  // Jit: fused predicate, then one product-accumulate pass.
  // Tvm: a single loop over the four columns.
  // ------------------------------------------------------------------

  def q6(tqp: TqpSession, mode: HandOptMode): TensorTable = {
    val li = tqp.tensorTable("lineitem")
    val ship = li.column("l_shipdate").i64
    val disc = li.column("l_discount").f64
    val qty  = li.column("l_quantity").f64
    val ep   = li.column("l_extendedprice").f64
    val lo = day("1994-01-01"); val hi = day("1995-01-01")
    val n = ship.length

    val revenue: Double = mode match {
      case Torch =>
        val m1 = TensorOps.ge(ship, I64Tensor.fill(n, lo))
        val m2 = TensorOps.lt(ship, I64Tensor.fill(n, hi))
        val m3 = TensorOps.ge(disc, F64Tensor.fill(n, 0.05))
        val m4 = TensorOps.le(disc, F64Tensor.fill(n, 0.07))
        val m5 = TensorOps.ltScalar(qty, 24.0)
        val mask = TensorOps.logicalAnd(TensorOps.logicalAnd(TensorOps.logicalAnd(m1, m2),
                   TensorOps.logicalAnd(m3, m4)), m5)
        val sp = TensorOps.maskedSelect(ep, mask)
        val sd = TensorOps.maskedSelect(disc, mask)
        TensorOps.sum(TensorOps.mul(sp, sd))
      case Jit =>
        // Fused predicate into one bitmap, then one masked product pass.
        val mask = new Array[Boolean](n)
        ExecCtx.current.device.parallelRanges(n) { (s, e) =>
          var i = s
          while (i < e) {
            val sd = ship.data(i); val d = disc.data(i)
            mask(i) = sd >= lo && sd < hi && d >= 0.05 && d <= 0.07 && qty.data(i) < 24.0
            i += 1
          }
        }
        Profile.rec("fusedFilter", OpClass.ElementWise, n, n * 26L)
        val sel = TensorOps.nonzero(BoolTensor(mask))
        TensorOps.sum(TensorOps.mul(TensorOps.indexSelect(ep, sel), TensorOps.indexSelect(disc, sel)))
      case Tvm =>
        // Whole-query codegen: single pass, no intermediates at all.
        q6TvmLoop(ship.data, disc.data, qty.data, ep.data, lo, hi)
    }
    TensorTable(Vector(Column("revenue", DType.F64, F64Tensor(Array(revenue)))))
  }

  /** Q6's fully fused kernel, kept as its own small method so HotSpot
    * compiles it (the dispatcher method is above the huge-method limit).
    */
  private def q6TvmLoop(ship: Array[Long], disc: Array[Double], qty: Array[Double],
                        ep: Array[Double], lo: Long, hi: Long): Double = {
    val n = ship.length
    var acc = 0.0
    var i = 0
    while (i < n) {
      val sd = ship(i); val d = disc(i)
      if (sd >= lo && sd < hi && d >= 0.05 && d <= 0.07 && qty(i) < 24.0)
        acc += ep(i) * d
      i += 1
    }
    Profile.rec("tvmFusedQ6", OpClass.ElementWise, n, n * 32L)
    acc
  }

  // ------------------------------------------------------------------
  // Q1 — tiny group domain: scatter straight into (returnflag, linestatus)
  // buckets, no sort, shared subexpressions computed once.
  // ------------------------------------------------------------------

  def q1(tqp: TqpSession, mode: HandOptMode): TensorTable = {
    require(mode != Tvm, "TVM supports only Q6 and Q14")
    val li = tqp.tensorTable("lineitem")
    val ship = li.column("l_shipdate").i64
    val qty  = li.column("l_quantity").f64
    val ep   = li.column("l_extendedprice").f64
    val disc = li.column("l_discount").f64
    val tax  = li.column("l_tax").f64
    val cut  = day("1998-09-02")
    val rfT = li.column("l_returnflag").str
    val lsT = li.column("l_linestatus").str
    val n = ship.length

    // Schema-aware key trick: both flags are 1-character columns, so the
    // raw byte IS an order-preserving code — no dictionary pass at all.
    // Wider string keys would fall back to dictEncode; TPC-H never needs it.
    require(rfT.width == 1 && lsT.width == 1, "Q1 flags are single characters")
    val nSeg = 256 * 256
    val seg = new Array[Long](n)
    val keep = new Array[Boolean](n)
    ExecCtx.current.device.parallelRanges(n) { (s, e) =>
      var i = s
      while (i < e) {
        keep(i) = ship.data(i) <= cut
        seg(i) = ((rfT.data(i) & 0xffL) << 8) | (lsT.data(i) & 0xffL)
        i += 1
      }
    }
    Profile.rec("packKeys", OpClass.ElementWise, n, n * 25L)

    val sums = Array.ofDim[Double](6, nSeg) // qty, base, disc_price, charge, disc, count
    mode match {
      case Torch =>
        val sel  = TensorOps.nonzero(BoolTensor(keep))
        val segT = TensorOps.indexSelect(I64Tensor(seg), sel)
        val qtyS = TensorOps.indexSelect(qty, sel)
        val epS  = TensorOps.indexSelect(ep, sel)
        val dS   = TensorOps.indexSelect(disc, sel)
        val tS   = TensorOps.indexSelect(tax, sel)
        // Shared subexpression: disc_price reused for charge.
        val dp = TensorOps.mul(epS, TensorOps.addScalar(TensorOps.neg(dS), 1.0))
        val ch = TensorOps.mul(dp, TensorOps.addScalar(tS, 1.0))
        sums(0) = TensorOps.scatterAdd(qtyS, segT, nSeg).data
        sums(1) = TensorOps.scatterAdd(epS, segT, nSeg).data
        sums(2) = TensorOps.scatterAdd(dp, segT, nSeg).data
        sums(3) = TensorOps.scatterAdd(ch, segT, nSeg).data
        sums(4) = TensorOps.scatterAdd(dS, segT, nSeg).data
        sums(5) = TensorOps.scatterAdd(F64Tensor.fill(segT.length, 1.0), segT, nSeg).data
      case _ =>
        q1FusedLoop(keep, seg, qty.data, ep.data, disc.data, tax.data, sums)
    }

    // Emit non-empty groups in (rf, ls) order — already sorted by packed id.
    val keepSeg = (0 until nSeg).filter(g => sums(5)(g) > 0)
    def col(name: String, f: Int => Double) =
      Column(name, DType.F64, F64Tensor(keepSeg.map(f).toArray))
    TensorTable(Vector(
      Column("l_returnflag", DType.Str, StringTensor.fromStrings(keepSeg.map(g => (g >> 8).toChar.toString).toArray)),
      Column("l_linestatus", DType.Str, StringTensor.fromStrings(keepSeg.map(g => (g & 0xff).toChar.toString).toArray)),
      col("sum_qty", g => sums(0)(g)),
      col("sum_base_price", g => sums(1)(g)),
      col("sum_disc_price", g => sums(2)(g)),
      col("sum_charge", g => sums(3)(g)),
      col("avg_qty", g => sums(0)(g) / sums(5)(g)),
      col("avg_price", g => sums(1)(g) / sums(5)(g)),
      col("avg_disc", g => sums(4)(g) / sums(5)(g)),
      Column("count_order", DType.I64, I64Tensor(keepSeg.map(g => sums(5)(g).toLong).toArray)),
    ))
  }

  /** Q1's fused aggregation kernel (own method so HotSpot compiles it). */
  private def q1FusedLoop(keep: Array[Boolean], seg: Array[Long], qty: Array[Double],
                          ep: Array[Double], disc: Array[Double], tax: Array[Double],
                          sums: Array[Array[Double]]): Unit = {
    val n = keep.length
    var i = 0
    while (i < n) {
      if (keep(i)) {
        val g = seg(i).toInt
        val d = disc(i); val e = ep(i)
        val dp = e * (1.0 - d)
        sums(0)(g) += qty(i)
        sums(1)(g) += e
        sums(2)(g) += dp
        sums(3)(g) += dp * (1.0 + tax(i))
        sums(4)(g) += d
        sums(5)(g) += 1.0
      }
      i += 1
    }
    Profile.rec("fusedAggQ1", OpClass.Scatter, n, n * 56L)
  }

  // ------------------------------------------------------------------
  // Q14 — date filter, then hash join on partkey, then one fused pass.
  // ------------------------------------------------------------------

  def q14(tqp: TqpSession, mode: HandOptMode): TensorTable = {
    val li = tqp.tensorTable("lineitem")
    val part = tqp.tensorTable("part")
    val ship = li.column("l_shipdate").i64
    val lo = day("1995-09-01"); val hi = day("1995-10-01")
    val mask = {
      val n = ship.length
      val m = new Array[Boolean](n)
      ExecCtx.current.device.parallelRanges(n) { (s, e) =>
        var i = s
        while (i < e) { m(i) = ship.data(i) >= lo && ship.data(i) < hi; i += 1 }
      }
      Profile.rec("fusedFilter", OpClass.ElementWise, n, n * 10L)
      BoolTensor(m)
    }
    val sel   = TensorOps.nonzero(mask)
    val lpk   = TensorOps.indexSelect(li.column("l_partkey").i64, sel)
    val ep    = TensorOps.indexSelect(li.column("l_extendedprice").f64, sel)
    val disc  = TensorOps.indexSelect(li.column("l_discount").f64, sel)
    // Hash join against part's primary key (better algorithm choice).
    val (lIdx, pIdx) = repro.core.ops.HashJoin.join(lpk, part.column("p_partkey").i64)
    val promo = StringTensor.startsWith(part.column("p_type").str, "PROMO")

    var num = 0.0; var den = 0.0
    mode match {
      case Torch =>
        val epJ = TensorOps.indexSelect(ep, lIdx)
        val dJ  = TensorOps.indexSelect(disc, lIdx)
        val pJ  = TensorOps.indexSelect(promo, pIdx)
        val rev = TensorOps.mul(epJ, TensorOps.addScalar(TensorOps.neg(dJ), 1.0))
        den = TensorOps.sum(rev)
        num = TensorOps.sum(TensorOps.where(pJ, rev, F64Tensor.fill(rev.length, 0.0)))
      case _ =>
        val (nm, dn) = q14FusedLoop(lIdx.data, pIdx.data, ep.data, disc.data, promo.data)
        num = nm; den = dn
    }
    TensorTable(Vector(Column("promo_revenue", DType.F64, F64Tensor(Array(100.0 * num / den)))))
  }

  /** Q14's fused join-output pass (own method so HotSpot compiles it). */
  private def q14FusedLoop(lIdx: Array[Long], pIdx: Array[Long], ep: Array[Double],
                           disc: Array[Double], promo: Array[Boolean]): (Double, Double) = {
    var num = 0.0; var den = 0.0
    var i = 0
    while (i < lIdx.length) {
      val l = lIdx(i).toInt; val p = pIdx(i).toInt
      val r = ep(l) * (1.0 - disc(l))
      den += r
      if (promo(p)) num += r
      i += 1
    }
    Profile.rec("tvmFusedQ14", OpClass.ElementWise, lIdx.length, lIdx.length * 34L)
    (num, den)
  }

  /** Q9's fused join-output aggregation (own method so HotSpot compiles it). */
  private def q9FusedLoop(lIdx: Array[Long], liSk: Array[Long], liOk: Array[Long],
                          liEp: Array[Double], liDc: Array[Double], liQt: Array[Double],
                          cost: Array[Double], nationBySupp: Array[Long], dateByOrder: Array[Long],
                          nameByNation: Array[Long], sums: Array[Double],
                          nYears: Int, minYear: Int): Unit = {
    var j = 0
    while (j < lIdx.length) {
      val l = lIdx(j).toInt
      val natc = nameByNation(nationBySupp(liSk(l).toInt).toInt)
      val yr = java.time.LocalDate.ofEpochDay(dateByOrder(liOk(l).toInt)).getYear
      val amount = liEp(l) * (1.0 - liDc(l)) - cost(j) * liQt(l)
      sums(natc.toInt * nYears + (yr - minYear)) += amount
      j += 1
    }
    Profile.rec("fusedAggQ9", OpClass.Scatter, lIdx.length, lIdx.length * 64L)
  }

  // ------------------------------------------------------------------
  // Q9 — semi-filter against part, direct-address gathers against the
  // dense primary keys (supplier, orders, nation), hash join to partsupp,
  // sort-free aggregation on packed (nation, year).
  // ------------------------------------------------------------------

  def q9(tqp: TqpSession, mode: HandOptMode): TensorTable = {
    require(mode != Tvm, "TVM supports only Q6 and Q14")
    val li   = tqp.tensorTable("lineitem")
    val part = tqp.tensorTable("part")
    val sup  = tqp.tensorTable("supplier")
    val ps   = tqp.tensorTable("partsupp")
    val ord  = tqp.tensorTable("orders")
    val nat  = tqp.tensorTable("nation")

    // part: flag partkeys whose name contains 'green' (join → semi filter).
    val greenMask = StringTensor.contains(part.column("p_name").str, "green")
    val pk = part.column("p_partkey").i64
    val maxPk = TensorOps.max(pk).toInt
    val greenFlag = new Array[Boolean](maxPk + 1)
    var i = 0
    while (i < pk.length) { if (greenMask.data(i)) greenFlag(pk.data(i).toInt) = true; i += 1 }
    Profile.rec("scatterFlags", OpClass.Scatter, pk.length, pk.length * 9L)

    val lpk = li.column("l_partkey").i64
    val keep = new Array[Boolean](lpk.length)
    ExecCtx.current.device.parallelRanges(lpk.length) { (s, e) =>
      var j = s
      while (j < e) { keep(j) = greenFlag(lpk.data(j).toInt); j += 1 }
    }
    Profile.rec("semiProbe", OpClass.Gather, lpk.length, lpk.length * 9L)
    val sel = TensorOps.nonzero(BoolTensor(keep))

    val liPk  = TensorOps.indexSelect(lpk, sel)
    val liSk  = TensorOps.indexSelect(li.column("l_suppkey").i64, sel)
    val liOk  = TensorOps.indexSelect(li.column("l_orderkey").i64, sel)
    val liEp  = TensorOps.indexSelect(li.column("l_extendedprice").f64, sel)
    val liDc  = TensorOps.indexSelect(li.column("l_discount").f64, sel)
    val liQt  = TensorOps.indexSelect(li.column("l_quantity").f64, sel)

    // partsupp lookup via hash join on packed (partkey, suppkey).
    val maxSk = TensorOps.max(sup.column("s_suppkey").i64) + 1
    def pack(p: I64Tensor, s: I64Tensor): I64Tensor = {
      val out = new Array[Long](p.length)
      ExecCtx.current.device.parallelRanges(p.length) { (st, e) =>
        var j = st
        while (j < e) { out(j) = p.data(j) * maxSk + s.data(j); j += 1 }
      }
      Profile.rec("packKeys", OpClass.ElementWise, p.length, p.length * 24L)
      I64Tensor(out)
    }
    val liKey = pack(liPk, liSk)
    val psKey = pack(ps.column("ps_partkey").i64, ps.column("ps_suppkey").i64)
    // Build on partsupp: its (partkey, suppkey) pairs are unique, so the
    // interleaved hash join converges in one collision-free-ish round.
    val (psIdx, lIdx) = repro.core.ops.HashJoin.join(psKey, liKey)
    val cost = TensorOps.indexSelect(ps.column("ps_supplycost").f64, psIdx)

    // Dense-key direct gathers instead of joins.
    val nationBySupp = {
      val sk = sup.column("s_suppkey").i64
      val nk = sup.column("s_nationkey").i64
      val arr = new Array[Long](maxSk.toInt)
      var j = 0
      while (j < sk.length) { arr(sk.data(j).toInt) = nk.data(j); j += 1 }
      Profile.rec("buildDenseMap", OpClass.Scatter, sk.length, sk.length * 16L)
      arr
    }
    val ok = ord.column("o_orderkey").i64
    val odate = ord.column("o_orderdate").i64
    val maxOk = TensorOps.max(ok).toInt
    val dateByOrder = {
      val arr = new Array[Long](maxOk + 1)
      var j = 0
      while (j < ok.length) { arr(ok.data(j).toInt) = odate.data(j); j += 1 }
      Profile.rec("buildDenseMap", OpClass.Scatter, ok.length, ok.length * 16L)
      arr
    }
    val (nNameCodes, nDict) = StringTensor.dictEncode(nat.column("n_name").str)
    val nameByNation = {
      val nk = nat.column("n_nationkey").i64
      val arr = new Array[Long](TensorOps.max(nk).toInt + 1)
      var j = 0
      while (j < nk.length) { arr(nk.data(j).toInt) = nNameCodes.data(j); j += 1 }
      arr
    }

    // Aggregate on packed (nationCode, year) — dense, sort-free.
    val minYear = 1992; val nYears = 8
    val nSeg = nDict.length * nYears
    val sums = new Array[Double](nSeg)
    mode match {
      case Torch =>
        val skJ  = TensorOps.indexSelect(liSk, lIdx)
        val okJ  = TensorOps.indexSelect(liOk, lIdx)
        val epJ  = TensorOps.indexSelect(liEp, lIdx)
        val dJ   = TensorOps.indexSelect(liDc, lIdx)
        val qJ   = TensorOps.indexSelect(liQt, lIdx)
        val amount = TensorOps.sub(
          TensorOps.mul(epJ, TensorOps.addScalar(TensorOps.neg(dJ), 1.0)),
          TensorOps.mul(cost, qJ))
        val seg = new Array[Long](lIdx.length)
        var j = 0
        while (j < lIdx.length) {
          val natc = nameByNation(nationBySupp(skJ.data(j).toInt).toInt)
          val yr = java.time.LocalDate.ofEpochDay(dateByOrder(okJ.data(j).toInt)).getYear
          seg(j) = natc * nYears + (yr - minYear)
          j += 1
        }
        Profile.rec("packKeys", OpClass.Gather, lIdx.length, lIdx.length * 40L)
        val red = TensorOps.scatterAdd(amount, I64Tensor(seg), nSeg)
        System.arraycopy(red.data, 0, sums, 0, nSeg)
      case _ =>
        q9FusedLoop(lIdx.data, liSk.data, liOk.data, liEp.data, liDc.data, liQt.data,
          cost.data, nationBySupp, dateByOrder, nameByNation, sums, nYears, minYear)
    }

    // A (nation, year) bucket is emitted iff some row hit it (re-derived
    // below; kept out of the fused kernel to keep that method small).
    val hit = new Array[Boolean](nSeg)
    var j = 0
    while (j < lIdx.length) {
      val l = lIdx.data(j).toInt
      val natc = nameByNation(nationBySupp(liSk.data(l).toInt).toInt)
      val yr = java.time.LocalDate.ofEpochDay(dateByOrder(liOk.data(l).toInt)).getYear
      hit(natc.toInt * nYears + (yr - minYear)) = true
      j += 1
    }
    val segsOut = (0 until nSeg).filter(hit)
      .sortBy(g => (nDict(g / nYears), -(g % nYears))) // nation asc, year desc
    TensorTable(Vector(
      Column("nation", DType.Str, StringTensor.fromStrings(segsOut.map(g => nDict(g / nYears)).toArray)),
      Column("o_year", DType.I64, I64Tensor(segsOut.map(g => (minYear + g % nYears).toLong).toArray)),
      Column("sum_profit", DType.F64, F64Tensor(segsOut.map(g => sums(g)).toArray)),
    ))
  }
}

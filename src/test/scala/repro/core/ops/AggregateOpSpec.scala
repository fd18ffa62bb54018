package repro.core.ops

import org.scalatest.funsuite.AnyFunSuite
import repro.core.data.{Column, DType, TensorTable}
import repro.core.expr._
import repro.core.ir.IRVar
import repro.tensor._

/** Algorithm 3 unit tests: grouped and global aggregation, nulls, DISTINCT,
  * string min/max, empty inputs — in sort-based and hash-based grouping.
  */
class AggregateOpSpec extends AnyFunSuite {
  import Expr._

  private def v(n: String, dt: DType) = IRVar(n, n, dt)

  private val table = TensorTable(Vector(
    Column("g", DType.I64, I64Tensor(Array(2L, 1L, 2L, 1L, 2L))),
    Column("x", DType.F64, F64Tensor(Array(10.0, 20.0, 30.0, 40.0, 50.0))),
    Column("nx", DType.F64, F64Tensor(Array(1.0, 0.0, 3.0, 0.0, 5.0)),
      Some(Array(true, false, true, false, true))),
    Column("s", DType.Str, StringTensor.fromStrings(Array("b", "z", "a", "y", "a"))),
  ))

  private def run(groupKeys: Seq[(Expr, IRVar)], aggs: Seq[AggCall],
                  res: Seq[(Expr, IRVar)], hash: Boolean = false,
                  input: TensorTable = table): TensorTable =
    AggregateOp.execute(input, groupKeys, aggs, res, compiled = false, hashGroups = hash, ExecEnv.empty)

  private val gKey = Seq((ColRef("g", DType.I64): Expr, v("g", DType.I64)))

  test("grouped sum/count/avg/min/max (sort and hash paths)") {
    for (hash <- Seq(false, true)) {
      val out = run(gKey,
        Seq(AggCall(AggFn.Sum, Some(ColRef("x", DType.F64)), distinct = false),
            AggCall(AggFn.CountStar, None, distinct = false),
            AggCall(AggFn.Avg, Some(ColRef("x", DType.F64)), distinct = false),
            AggCall(AggFn.Min, Some(ColRef("x", DType.F64)), distinct = false),
            AggCall(AggFn.Max, Some(ColRef("x", DType.F64)), distinct = false)),
        Seq((ColRef("g", DType.I64), v("g", DType.I64)),
            (AggRef(0, DType.F64), v("s", DType.F64)),
            (AggRef(1, DType.I64), v("c", DType.I64)),
            (AggRef(2, DType.F64), v("a", DType.F64)),
            (AggRef(3, DType.F64), v("mn", DType.F64)),
            (AggRef(4, DType.F64), v("mx", DType.F64))), hash)
      val rows = (0 until out.numRows).map { i =>
        (out.column("g").i64.data(i), out.column("s").f64.data(i), out.column("c").i64.data(i),
         out.column("a").f64.data(i), out.column("mn").f64.data(i), out.column("mx").f64.data(i))
      }.sortBy(_._1)
      assert(rows == Seq((1L, 60.0, 2L, 30.0, 20.0, 40.0), (2L, 90.0, 3L, 30.0, 10.0, 50.0)))
    }
  }

  test("nulls are skipped by sum/count/avg but counted by count(*)") {
    val out = run(gKey,
      Seq(AggCall(AggFn.Sum, Some(ColRef("nx", DType.F64)), distinct = false),
          AggCall(AggFn.Count, Some(ColRef("nx", DType.F64)), distinct = false),
          AggCall(AggFn.CountStar, None, distinct = false),
          AggCall(AggFn.Avg, Some(ColRef("nx", DType.F64)), distinct = false)),
      Seq((ColRef("g", DType.I64), v("g", DType.I64)),
          (AggRef(0, DType.F64), v("s", DType.F64)),
          (AggRef(1, DType.I64), v("c", DType.I64)),
          (AggRef(2, DType.I64), v("cs", DType.I64)),
          (AggRef(3, DType.F64), v("a", DType.F64))))
    val byG = (0 until out.numRows).map(i => out.column("g").i64.data(i) -> i).toMap
    val g1 = byG(1L); val g2 = byG(2L)
    // Group 1: both values null → sum/avg null, count 0, count(*) 2.
    assert(!out.column("s").isValid(g1) && !out.column("a").isValid(g1))
    assert(out.column("c").i64.data(g1) == 0L && out.column("cs").i64.data(g1) == 2L)
    // Group 2: 1+3+5 = 9, count 3.
    assert(out.column("s").f64.data(g2) == 9.0 && out.column("c").i64.data(g2) == 3L)
  }

  test("count distinct and sum distinct") {
    val out = run(gKey,
      Seq(AggCall(AggFn.Count, Some(ColRef("s", DType.Str)), distinct = true),
          AggCall(AggFn.Sum, Some(ColRef("x", DType.F64)), distinct = false)),
      Seq((ColRef("g", DType.I64), v("g", DType.I64)),
          (AggRef(0, DType.I64), v("cd", DType.I64)),
          (AggRef(1, DType.F64), v("sx", DType.F64))))
    val rows = (0 until out.numRows).map { i =>
      (out.column("g").i64.data(i), out.column("cd").i64.data(i))
    }.sortBy(_._1)
    // g=1 has {z, y} → 2; g=2 has {b, a, a} → 2 distinct.
    assert(rows == Seq((1L, 2L), (2L, 2L)))
  }

  test("min/max over strings") {
    val out = run(gKey,
      Seq(AggCall(AggFn.Min, Some(ColRef("s", DType.Str)), distinct = false),
          AggCall(AggFn.Max, Some(ColRef("s", DType.Str)), distinct = false)),
      Seq((ColRef("g", DType.I64), v("g", DType.I64)),
          (AggRef(0, DType.Str), v("mn", DType.Str)),
          (AggRef(1, DType.Str), v("mx", DType.Str))))
    val rows = (0 until out.numRows).map { i =>
      (out.column("g").i64.data(i), out.column("mn").str.rowString(i), out.column("mx").str.rowString(i))
    }.sortBy(_._1)
    assert(rows == Seq((1L, "y", "z"), (2L, "a", "b")))
  }

  test("global aggregate over empty input returns one row with SQL semantics") {
    val empty = TensorTable(Vector(
      Column("x", DType.F64, F64Tensor(Array.emptyDoubleArray))))
    val out = run(Nil,
      Seq(AggCall(AggFn.Sum, Some(ColRef("x", DType.F64)), distinct = false),
          AggCall(AggFn.CountStar, None, distinct = false)),
      Seq((AggRef(0, DType.F64), v("s", DType.F64)),
          (AggRef(1, DType.I64), v("c", DType.I64))),
      input = empty)
    assert(out.numRows == 1)
    assert(!out.column("s").isValid(0), "sum over empty is NULL")
    assert(out.column("c").i64.data(0) == 0L)
  }

  test("grouped aggregate over empty input returns zero rows") {
    val empty = TensorTable(Vector(
      Column("g", DType.I64, I64Tensor(Array.emptyLongArray)),
      Column("x", DType.F64, F64Tensor(Array.emptyDoubleArray))))
    val out = run(gKey,
      Seq(AggCall(AggFn.Sum, Some(ColRef("x", DType.F64)), distinct = false)),
      Seq((ColRef("g", DType.I64), v("g", DType.I64)), (AggRef(0, DType.F64), v("s", DType.F64))),
      input = empty)
    assert(out.numRows == 0)
  }

  test("post-aggregation expressions combine slots (sum/sum)") {
    val out = run(gKey,
      Seq(AggCall(AggFn.Sum, Some(ColRef("x", DType.F64)), distinct = false),
          AggCall(AggFn.CountStar, None, distinct = false)),
      Seq((Arith(DivK, AggRef(0, DType.F64), AggRef(1, DType.I64)), v("manual_avg", DType.F64))))
    val vals = (0 until out.numRows).map(i => out.column("manual_avg").f64.data(i)).sorted
    assert(vals == Seq(30.0, 30.0))
  }

  test("multi-column group keys") {
    val t2 = table.withColumn(Column("g2", DType.Str,
      StringTensor.fromStrings(Array("p", "p", "q", "p", "q"))))
    val out = AggregateOp.execute(t2,
      Seq((ColRef("g", DType.I64), v("g", DType.I64)), (ColRef("g2", DType.Str), v("g2", DType.Str))),
      Seq(AggCall(AggFn.CountStar, None, distinct = false)),
      Seq((ColRef("g", DType.I64), v("g", DType.I64)),
          (ColRef("g2", DType.Str), v("g2", DType.Str)),
          (AggRef(0, DType.I64), v("c", DType.I64))),
      compiled = false, hashGroups = false, ExecEnv.empty)
    val rows = (0 until out.numRows).map { i =>
      (out.column("g").i64.data(i), out.column("g2").str.rowString(i), out.column("c").i64.data(i))
    }.toSet
    assert(rows == Set((2L, "p", 1L), (1L, "p", 2L), (2L, "q", 2L)))
  }
}

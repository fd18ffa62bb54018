package repro.handopt

import repro.{OracleTyped, SparkSpec}
import repro.core.data.TensorTable
import repro.core.exec.TqpConfig
import repro.tensor.{ExecCtx, Profile}
import repro.tpch.{TpchEnv, TpchQueries}

/** Hand-optimized plans (§6.6): every (query, mode) combination must return
  * exactly the generic engine's (and DuckDB's) answer, while issuing fewer
  * tensor ops than the generic plan.
  */
class HandOptSpec extends SparkSpec {

  private val sf = 0.005
  private lazy val tqp  = TpchEnv.session(spark, sf)
  private lazy val tabs = TpchEnv.oracleTables(tqp)
  private lazy val queries = TpchQueries.all(sf).toMap

  for {
    q <- Table3Queries.all
    mode <- Seq(HandOptMode.Torch, HandOptMode.Jit, HandOptMode.Tvm)
    if HandOptimized.supported(q, mode)
  } test(s"$q hand-optimized [$mode] matches DuckDB") {
    val sql = queries(q)
    val df  = TensorTable.toDataFrame(spark, HandOptimized.run(q, tqp, mode))
    OracleTyped.assertEquivalent(df, sql,
      tabs.filter { case (n, _) => sql.toLowerCase.contains(n) }: _*)
  }

  test("unsupported combinations are rejected") {
    assert(!HandOptimized.supported("Q1", HandOptMode.Tvm))
    assert(!HandOptimized.supported("Q2", HandOptMode.Torch))
    assertThrows[IllegalArgumentException](HandOptimized.run("Q2", tqp, HandOptMode.Torch))
  }

  test("hand-optimized Q1 issues fewer tensor ops than the generic plan") {
    val generic = new Profile
    val ir = tqp.compile(queries("Q1"))
    ExecCtx.withProfile(generic) { tqp.run(ir, TqpConfig.interpreted) }
    val hand = new Profile
    ExecCtx.withProfile(hand) { HandOptimized.run("Q1", tqp, HandOptMode.Torch) }
    assert(hand.totalOps < generic.totalOps,
      s"hand ${hand.totalOps} ops vs generic ${generic.totalOps}")
  }
}

private object Table3Queries { val all = Seq("Q1", "Q6", "Q9", "Q14") }

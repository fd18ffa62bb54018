package repro.ml

import repro.core.TqpSession
import repro.core.data.{Column, DType, TensorTable}
import repro.core.exec.TqpConfig
import repro.tensor._

/** The §6.7 prediction query: a GBT over features computed by a relational
  * query on customer ⋈ orders — compiled end-to-end onto the tensor runtime
  * (relational part via TQP, featurization via one-hot + standard scaling
  * as tensor ops, model via [[GbtModel.predict]]).
  */
object PredictionQuery {

  /** Relational feature query (the paper's filters folded in). */
  val featureSql: String = """
    select c_custkey, c_nationkey, c_acctbal, max(o_orderstatus) as c_orderstatus,
           sum(o_totalprice) as sum_totalprice
    from customer, orders
    where c_custkey = o_custkey
      and c_mktsegment = 'BUILDING' and o_orderdate >= date '1993-10-01'
    group by c_custkey, c_nationkey, c_acctbal
    order by c_custkey"""

  final case class Featurized(cols: Array[F64Tensor], names: Array[String])

  /** One-hot encode the categorical column and standard-scale numerics —
    * both as tensor ops (the ML-operator half of the unified plan).
    */
  def featurize(t: TensorTable): Featurized = {
    val statuses = Seq("F", "O", "P")
    val oneHot = statuses.map { s =>
      val mask = StringTensor.eqConst(t.column("c_orderstatus").str, s)
      F64Tensor(mask.data.map(b => if (b) 1.0 else 0.0))
    }
    def scaled(name: String): F64Tensor = {
      val c = t.column(name)
      val f = c.dtype match {
        case DType.F64 => c.f64
        case _         => TensorOps.toF64(c.i64)
      }
      val n = f.length
      val mean = if (n == 0) 0.0 else TensorOps.sum(f) / n
      val varr = if (n == 0) 1.0 else {
        val d = TensorOps.addScalar(f, -mean)
        math.max(TensorOps.sum(TensorOps.mul(d, d)) / n, 1e-12)
      }
      val sd = math.sqrt(varr)
      val out = TensorOps.addScalar(f, -mean)
      F64Tensor(out.data.map(_ / sd))
    }
    val nums = Seq("c_custkey", "c_nationkey", "c_acctbal", "sum_totalprice").map(scaled)
    Featurized((nums ++ oneHot).toArray,
      (Seq("c_custkey", "c_nationkey", "c_acctbal", "sum_totalprice") ++ statuses.map("status_" + _)).toArray)
  }

  /** Train the paper's model (128 trees, depth 8) on the feature table with
    * a synthetic regression target (a noisy function of the features —
    * stands in for the proprietary label the paper does not specify).
    */
  def train(t: TensorTable, nTrees: Int = 128, depth: Int = 8): GbtModel = {
    val f = featurize(t)
    val n = t.numRows
    val rnd = new scala.util.Random(7)
    val target = Array.tabulate(n) { i =>
      3.0 * f.cols(2).data(i) - 2.0 * f.cols(3).data(i) +
        1.5 * f.cols(4).data(i) + 0.3 * rnd.nextGaussian()
    }
    Gbt.fit(f.cols.map(_.data), target, nTrees, depth)
  }

  /** End-to-end TQP execution: relational part on the tensor engine, then
    * featurize + predict, returning (custkey, prediction).
    */
  def runTqp(tqp: TqpSession, model: GbtModel, cfg: TqpConfig): TensorTable = {
    val rel = tqp.run(featureSql, cfg)
    val f   = featurize(rel)
    val yhat = model.predict(f.cols)
    TensorTable(Vector(rel.column("c_custkey"), Column("prediction", DType.F64, yhat)))
  }
}

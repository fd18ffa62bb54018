package repro.bench

import org.apache.spark.sql.SparkSession
import repro.OracleTyped
import repro.core.exec.TqpConfig
import repro.ml.{GbtModel, PredictionQuery}
import repro.tensor._
import repro.tpch.TpchEnv

/** §6.7 prediction query (the paper's Figure 8, reproduced as a table): a
  * GBT (128 trees, depth 8) over customer ⋈ orders features, end-to-end on
  * each engine. Baselines: Spark-style (relational on Spark SQL + row-wise
  * tree traversal, the MLlib execution model) and DuckDB+sklearn-style
  * (relational on DuckDB + batch array inference). TQP runs the unified
  * tensor plan; its GPU number is simulated from the op trace.
  */
object PredictionRunner {

  final case class Result(engine: String, ms: Double)

  def run(spark: SparkSession, sf: Double): Seq[Result] = {
    val tqp = TpchEnv.session(spark, sf)
    val oracleTabs = TpchEnv.oracleTables(tqp)
      .filter { case (n, _) => Seq("customer", "orders").contains(n) }
    tqp.registeredTables.foreach { t => spark.table(t).cache().count() }

    // Train once on the tensor-side feature table (model shared by engines).
    val featureTable = tqp.run(PredictionQuery.featureSql, TqpConfig.interpreted)
    val model: GbtModel = PredictionQuery.train(featureTable)

    // Spark-style: relational on Spark, per-row traversal on the driver.
    def cellNum(r: org.apache.spark.sql.Row, i: Int): Double = r.get(i) match {
      case l: java.lang.Long    => l.toDouble
      case x: java.lang.Integer => x.toDouble
      case d: java.lang.Double  => d
      case o => throw new IllegalArgumentException(s"bad cell $o")
    }
    val sparkMs = Measure.medianMs {
      val rows = spark.sql(PredictionQuery.featureSql).collect()
      rows.map { r =>
        val status = r.getString(3)
        val raw = Array(cellNum(r, 0), cellNum(r, 1), cellNum(r, 2), cellNum(r, 4),
          if (status == "F") 1.0 else 0.0, if (status == "O") 1.0 else 0.0, if (status == "P") 1.0 else 0.0)
        model.predictRow(raw)
      }
    }

    // DuckDB + sklearn-style: relational on DuckDB, batch tensor inference.
    val duckMs = Measure.medianMs {
      val rows = OracleTyped.query(PredictionQuery.featureSql, oracleTabs: _*)
      val n = rows.length
      def num(i: Int, c: Int): Double = rows(i)(c) match {
        case l: java.lang.Long => l.toDouble
        case d: java.lang.Double => d
        case b: java.math.BigDecimal => b.doubleValue
        case i2: java.lang.Integer => i2.toDouble
        case o => throw new IllegalArgumentException(s"$o")
      }
      val feats = Array(
        F64Tensor(Array.tabulate(n)(num(_, 0))), F64Tensor(Array.tabulate(n)(num(_, 1))),
        F64Tensor(Array.tabulate(n)(num(_, 2))), F64Tensor(Array.tabulate(n)(num(_, 4))),
        F64Tensor(Array.tabulate(n)(i => if (rows(i)(3) == "F") 1.0 else 0.0)),
        F64Tensor(Array.tabulate(n)(i => if (rows(i)(3) == "O") 1.0 else 0.0)),
        F64Tensor(Array.tabulate(n)(i => if (rows(i)(3) == "P") 1.0 else 0.0)))
      model.predict(feats)
    }

    // TQP: unified tensor plan (relational + featurize + model).
    val cpu1Ms = Measure.medianMs {
      PredictionQuery.runTqp(tqp, model, TqpConfig.interpreted)
    }
    val dev6 = new CpuDevice(6)
    val cpu6Ms =
      try Measure.medianMs { ExecCtx.withDevice(dev6) { PredictionQuery.runTqp(tqp, model, TqpConfig.interpreted) } }
      finally dev6.close()
    val profile = new Profile
    ExecCtx.withProfile(profile) { PredictionQuery.runTqp(tqp, model, TqpConfig.interpreted) }
    val gpuMs = DeviceModel.P100.timeMs(profile)

    Seq(
      Result("Spark-style (1 node CPU)", sparkMs),
      Result("DuckDB+sklearn-style (CPU)", duckMs),
      Result("TQP (CPU, 1 core)", cpu1Ms),
      Result("TQP (CPU, 6 cores)", cpu6Ms),
      Result("TQP (GPU, simulated)", gpuMs),
    )
  }

  def print(results: Seq[Result], sf: Double): Unit =
    Measure.printTable(s"Prediction query (§6.7) end-to-end time (ms) at SF=$sf",
      Seq("Engine", "Time (ms)"),
      results.map(r => Seq(r.engine, Measure.fmt(Some(r.ms)))))
}

package repro.tpch

import org.apache.spark.sql.SparkSession
import repro.TpchLite
import repro.core.TqpSession

/** Shared TPC-H environment: one TqpSession with all eight lite tables
  * registered (generated, collected, converted to tensors, and exposed as
  * Spark temp views). Cached per (sf, seed) — tests and benches reuse it.
  */
object TpchEnv {

  private val cache = scala.collection.mutable.Map[(Double, Long), TqpSession]()

  def session(spark: SparkSession, sf: Double, seed: Long = 0): TqpSession = synchronized {
    cache.getOrElseUpdate((sf, seed), {
      val tqp = new TqpSession(spark)
      TpchLite.all(spark, sf, seed).foreach { case (name, df) => tqp.register(name, df) }
      tqp
    })
  }

  /** Oracle-side tables: the registered (materialized) Spark views. */
  def oracleTables(tqp: TqpSession): Seq[(String, org.apache.spark.sql.DataFrame)] =
    tqp.registeredTables.map(n => n -> tqp.spark.table(n))
}

package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Full TPC-H-lite schema at a configurable scale factor — the dbgen
  * substitute (see DESIGN.md §3).
  *
  * Extends the provided [[SynthData]] generators with the remaining columns
  * and tables the 22 TPC-H queries touch. Row counts scale with SF exactly
  * like dbgen (SF=1 ⇒ 6M lineitem rows); word-pool text columns give LIKE
  * predicates paper-like selectivities. Deterministic in (sf, seed).
  */
object TpchLite {

  val NationCount = 25
  val RegionCount = 5

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)
  private def nSupp(sf: Double): Long = n(10_000L, sf)

  private def pick(col: org.apache.spark.sql.Column, values: Seq[String]): org.apache.spark.sql.Column =
    element_at(array(values.map(lit): _*), (col * values.length + 1).cast("int"))

  /** lineitem: SynthData's columns plus supplier key, commit/receipt dates,
    * ship mode/instructions.
    */
  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    val base = SynthData.lineitem(spark, sf, seed)
    val ns = nSupp(sf)
    base
      .withColumn("l_suppkey", (rand(seed + 10) * ns + 1).cast(LongType))
      .withColumn("l_commitdate", expr(s"date_add(l_shipdate, cast(rand(${seed + 11}) * 120 - 60 as int))"))
      .withColumn("l_receiptdate", expr(s"date_add(l_shipdate, cast(rand(${seed + 12}) * 30 + 1 as int))"))
      .withColumn("l_shipmode", pick(rand(seed + 13),
        Seq("MAIL", "SHIP", "AIR", "RAIL", "TRUCK", "REG AIR", "AIR REG", "FOB")))
      .withColumn("l_shipinstruct", pick(rand(seed + 14),
        Seq("DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN")))
  }

  /** orders: SynthData's columns plus priority, ship priority and comment. */
  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    val base = SynthData.orders(spark, sf, seed)
    val words1 = Seq("carefully", "quickly", "furiously", "slyly", "blithely", "ironic", "final", "pending")
    val words2 = Seq("packages", "deposits", "accounts", "special", "express", "regular", "bold", "unusual")
    val words3 = Seq("requests", "instructions", "theodolites", "foxes", "pinto beans", "ideas", "dependencies", "platelets")
    // TPC-H property: a third of customers never place orders (drives Q13's
    // zero-bucket and Q22's anti join) — restrict o_custkey to 2/3 of keys.
    val nCust = n(150_000L, sf)
    base
      .withColumn("o_custkey", (rand(seed + 14) * math.max(1L, nCust * 2 / 3) + 1).cast(LongType))
      .withColumn("o_orderpriority", pick(rand(seed + 10),
        Seq("1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW")))
      .withColumn("o_shippriority", lit(0).cast(LongType))
      .withColumn("o_comment", concat_ws(" ",
        pick(rand(seed + 11), words1), pick(rand(seed + 12), words2), pick(rand(seed + 13), words3)))
  }

  /** customer: SynthData's columns plus name, address and phone. */
  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    val base = SynthData.customer(spark, sf, seed)
    base
      .withColumn("c_name", concat(lit("Customer#"), format_string("%09d", col("c_custkey"))))
      .withColumn("c_address", format_string("addr-%07d", (rand(seed + 10) * 10000000).cast("int")))
      .withColumn("c_phone", format_string("%02d-%03d-%03d-%04d",
        col("c_nationkey") + 10,
        (rand(seed + 11) * 900 + 100).cast("int"),
        (rand(seed + 12) * 900 + 100).cast("int"),
        (rand(seed + 13) * 9000 + 1000).cast("int")))
  }

  /** part: SynthData's columns plus name, mfgr, brand, container; p_type is
    * regenerated as the TPC-H three-word form so `LIKE '%BRASS'` and
    * `= 'ECONOMY ANODIZED STEEL'` behave as in the benchmark.
    */
  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    val base = SynthData.part(spark, sf, seed).drop("p_type")
    val colors = Seq("green", "blue", "red", "metallic", "almond", "antique", "aquamarine", "azure", "beige", "bisque")
    val t1 = Seq("STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO")
    val t2 = Seq("ANODIZED", "BURNISHED", "PLATED", "POLISHED", "BRUSHED")
    val t3 = Seq("TIN", "NICKEL", "BRASS", "STEEL", "COPPER")
    val cont1 = Seq("SM", "LG", "MED", "JUMBO", "WRAP")
    val cont2 = Seq("CASE", "BOX", "BAG", "JAR", "PKG", "PACK", "CAN", "DRUM")
    base
      .withColumn("p_name", concat_ws(" ", pick(rand(seed + 10), colors), pick(rand(seed + 11), colors)))
      .withColumn("p_mfgr", concat(lit("Manufacturer#"), (rand(seed + 12) * 5 + 1).cast("int").cast("string")))
      .withColumn("p_brand", concat(lit("Brand#"),
        (rand(seed + 13) * 5 + 1).cast("int").cast("string"),
        (rand(seed + 14) * 5 + 1).cast("int").cast("string")))
      .withColumn("p_type", concat_ws(" ",
        pick(rand(seed + 15), t1), pick(rand(seed + 16), t2), pick(rand(seed + 17), t3)))
      .withColumn("p_container", concat_ws(" ", pick(rand(seed + 18), cont1), pick(rand(seed + 19), cont2)))
  }

  def supplier(spark: SparkSession, sf: Double = 0.01, seed: Long = 7): DataFrame = {
    import spark.implicits._
    val words1 = Seq("carefully", "quickly", "furiously", "slyly", "blithely", "Customer", "final", "pending", "ironic", "bold")
    val words2 = Seq("packages", "deposits", "accounts", "Complaints", "express", "regular", "requests", "unusual", "ideas", "foxes")
    spark.range(1, nSupp(sf) + 1).toDF("s_suppkey").select(
      $"s_suppkey",
      concat(lit("Supplier#"), format_string("%09d", $"s_suppkey"))          as "s_name",
      format_string("saddr-%07d", (rand(seed) * 10000000).cast("int"))       as "s_address",
      (rand(seed + 1) * NationCount).cast(IntegerType)                       as "s_nationkey",
      format_string("%02d-%03d-%03d-%04d",
        (rand(seed + 1) * NationCount).cast("int") + 10,
        (rand(seed + 2) * 900 + 100).cast("int"),
        (rand(seed + 3) * 900 + 100).cast("int"),
        (rand(seed + 4) * 9000 + 1000).cast("int"))                          as "s_phone",
      round(rand(seed + 5) * 10000 - 1000, 2)                                as "s_acctbal",
      concat_ws(" ", pick(rand(seed + 6), words1), pick(rand(seed + 7), words2)) as "s_comment",
    )
  }

  /** partsupp: 4 suppliers per part, distinct (partkey, suppkey) pairs via
    * the dbgen-style offset formula.
    */
  def partsupp(spark: SparkSession, sf: Double = 0.01, seed: Long = 8): DataFrame = {
    import spark.implicits._
    val nPart = n(200_000L, sf)
    val ns    = nSupp(sf)
    spark.range(nPart * 4).toDF("id").select(
      ($"id" / 4).cast(LongType) + 1 as "ps_partkey",
      (($"id" / 4).cast(LongType) + ($"id" % 4) * ((ns / 4).max(1)) ) % ns + 1 as "ps_suppkey",
      (rand(seed) * 9999 + 1).cast(IntegerType) as "ps_availqty",
      round(rand(seed + 1) * 999 + 1, 2)        as "ps_supplycost",
    )
  }

  val NationNames: Seq[String] = Seq(
    "ALGERIA", "ARGENTINA", "BRAZIL", "CANADA", "EGYPT", "ETHIOPIA", "FRANCE",
    "GERMANY", "INDIA", "INDONESIA", "IRAN", "IRAQ", "JAPAN", "JORDAN", "KENYA",
    "MOROCCO", "MOZAMBIQUE", "PERU", "CHINA", "ROMANIA", "SAUDI ARABIA",
    "VIETNAM", "RUSSIA", "UNITED KINGDOM", "UNITED STATES")

  val RegionNames: Seq[String] = Seq("AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST")

  /** TPC-H nation→region mapping. */
  private val NationRegion: Seq[Int] =
    Seq(0, 1, 1, 1, 4, 0, 3, 3, 2, 2, 4, 4, 2, 4, 0, 0, 0, 1, 2, 3, 4, 2, 3, 3, 1)

  def nation(spark: SparkSession): DataFrame = {
    import spark.implicits._
    NationNames.zipWithIndex.map { case (name, k) =>
      (k.toLong, name, NationRegion(k).toLong)
    }.toDF("n_nationkey", "n_name", "n_regionkey")
  }

  def region(spark: SparkSession): DataFrame = {
    import spark.implicits._
    RegionNames.zipWithIndex.map { case (name, k) => (k.toLong, name) }
      .toDF("r_regionkey", "r_name")
  }

  /** All eight tables, materialization left to the caller. */
  def all(spark: SparkSession, sf: Double, seed: Long = 0): Map[String, DataFrame] = Map(
    "lineitem" -> lineitem(spark, sf, seed),
    "orders"   -> orders(spark, sf, seed + 100),
    "customer" -> customer(spark, sf, seed + 200),
    "part"     -> part(spark, sf, seed + 300),
    "supplier" -> supplier(spark, sf, seed + 400),
    "partsupp" -> partsupp(spark, sf, seed + 500),
    "nation"   -> nation(spark),
    "region"   -> region(spark),
  )
}

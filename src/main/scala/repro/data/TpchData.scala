package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Catalog

/** Synthetic TPC-H-shaped data for all eight tables, at a configurable scale
  * factor (SF=1 ≈ the paper's dataset size; tests run SF=0.01, benches
  * SF≈0.1 — documented substitution in DESIGN.md).
  *
  * Deterministic in (sf, seed); value distributions follow the TPC-H spec
  * closely enough that all 22 queries have selective predicates and
  * non-empty results (comments embed the `special…requests` /
  * `Customer…Complaints` phrases Q13/Q16 grep for, part names embed colors
  * for Q9, phones carry 2-digit country codes for Q22, …).
  */
object TpchData {
  val NLineitemPerSf = 6_000_000L
  val NOrdersPerSf   = 1_500_000L
  val NCustomerPerSf =   150_000L
  val NPartPerSf     =   200_000L
  val NSupplierPerSf =    10_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  private val Segments   = Seq("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")
  private val Priorities = Seq("1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW")
  private val ShipModes  = Seq("REG AIR", "AIR", "RAIL", "SHIP", "TRUCK", "MAIL", "FOB")
  private val Instructs  = Seq("DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN")
  private val Types1     = Seq("STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO")
  private val Types2     = Seq("ANODIZED", "BURNISHED", "PLATED", "POLISHED", "BRUSHED")
  private val Types3     = Seq("TIN", "NICKEL", "BRASS", "STEEL", "COPPER")
  private val Containers = Seq("SM CASE", "SM BOX", "MED BAG", "MED BOX", "LG CASE", "LG BOX", "JUMBO PKG")
  private val Colors     = Seq("green", "blue", "red", "ivory", "almond", "puff", "yellow", "chocolate")
  private val NationNames = Seq(
    "ALGERIA", "ARGENTINA", "BRAZIL", "CANADA", "EGYPT", "ETHIOPIA", "FRANCE",
    "GERMANY", "INDIA", "INDONESIA", "IRAN", "IRAQ", "JAPAN", "JORDAN", "KENYA",
    "MOROCCO", "MOZAMBIQUE", "PERU", "CHINA", "ROMANIA", "SAUDI ARABIA",
    "VIETNAM", "RUSSIA", "UNITED KINGDOM", "UNITED STATES")
  private val RegionNames = Seq("AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST")

  private def pick(choices: Seq[String], seed: Long) =
    element_at(array(choices.map(lit): _*), (rand(seed) * choices.size + 1).cast("int"))

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf); val nSupp = n(NSupplierPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)   as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)   as "l_partkey",
      (rand(seed + 10) * nSupp  + 1).cast(LongType)   as "l_suppkey",
      (rand(seed + 2) * 7 + 1).cast(LongType)         as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(LongType).cast(DoubleType) as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)          as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                 as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                 as "l_tax",
      pick(Seq("N", "R", "A"), seed + 7)              as "l_returnflag",
      pick(Seq("O", "F"), seed + 8)                   as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType), (rand(seed + 9)  * 2557).cast("int")) as "l_shipdate",
      date_add(lit("1992-01-15").cast(DateType), (rand(seed + 11) * 2557).cast("int")) as "l_commitdate",
      date_add(lit("1992-01-08").cast(DateType), (rand(seed + 12) * 2557).cast("int")) as "l_receiptdate",
      pick(Instructs, seed + 13)                      as "l_shipinstruct",
      pick(ShipModes, seed + 14)                      as "l_shipmode",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      col("o_orderkey"),
      (rand(seed) * nCust + 1).cast(LongType)         as "o_custkey",
      pick(Seq("O", "F", "P"), seed + 1)              as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)        as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType), (rand(seed + 3) * 2406).cast("int")) as "o_orderdate",
      pick(Priorities, seed + 4)                      as "o_orderpriority",
      concat(lit("Clerk#"), lpad((rand(seed + 5) * 1000).cast("int").cast("string"), 9, "0")) as "o_clerk",
      lit(0L)                                         as "o_shippriority",
      // ~5% of comments contain the Q13 "special ... requests" phrase
      when(rand(seed + 6) < 0.05,
           concat(lit("was special pending requests "), (rand(seed + 7) * 1000).cast("int").cast("string")))
        .otherwise(concat(lit("regular deposits sleep quickly "), (rand(seed + 7) * 1000).cast("int").cast("string")))
        as "o_comment",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      col("c_custkey"),
      concat(lit("Customer#"), lpad(col("c_custkey").cast("string"), 9, "0")) as "c_name",
      concat(lit("addr"), (rand(seed + 5) * 100000).cast("int").cast("string")) as "c_address",
      (rand(seed) * 25).cast(LongType)                as "c_nationkey",
      concat(((rand(seed + 3) * 25 + 10).cast("int")).cast("string"), lit("-"),
             (rand(seed + 4) * 900 + 100).cast("int").cast("string"), lit("-"),
             (rand(seed + 6) * 900 + 100).cast("int").cast("string")) as "c_phone",
      round(rand(seed + 1) * 10999.99 - 999.99, 2)    as "c_acctbal",
      pick(Segments, seed + 2)                        as "c_mktsegment",
      lit("customer comment")                         as "c_comment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      col("p_partkey"),
      concat(pick(Colors, seed + 2), lit(" "), pick(Colors, seed + 3), lit(" part")) as "p_name",
      concat(lit("Manufacturer#"), ((rand(seed + 4) * 5 + 1).cast("int")).cast("string")) as "p_mfgr",
      concat(lit("Brand#"), ((rand(seed + 5) * 5 + 1).cast("int")).cast("string"),
             ((rand(seed + 6) * 5 + 1).cast("int")).cast("string")) as "p_brand",
      concat(pick(Types1, seed), lit(" "), pick(Types2, seed + 7), lit(" "), pick(Types3, seed + 8)) as "p_type",
      (rand(seed + 1) * 50 + 1).cast(LongType)        as "p_size",
      pick(Containers, seed + 9)                      as "p_container",
      round(lit(900.0) + (col("p_partkey") % 1000) / 10.0, 2) as "p_retailprice",
    )
  }

  def supplier(spark: SparkSession, sf: Double = 0.01, seed: Long = 6): DataFrame = {
    spark.range(1, n(NSupplierPerSf, sf) + 1).toDF("s_suppkey").select(
      col("s_suppkey"),
      concat(lit("Supplier#"), lpad(col("s_suppkey").cast("string"), 9, "0")) as "s_name",
      concat(lit("saddr"), (rand(seed + 1) * 100000).cast("int").cast("string")) as "s_address",
      (rand(seed) * 25).cast(LongType)                as "s_nationkey",
      concat(((rand(seed + 2) * 25 + 10).cast("int")).cast("string"), lit("-"),
             (rand(seed + 3) * 900 + 100).cast("int").cast("string")) as "s_phone",
      round(rand(seed + 4) * 10999.99 - 999.99, 2)    as "s_acctbal",
      // ~3% carry the Q16 "Customer ... Complaints" phrase
      when(rand(seed + 5) < 0.03, lit("bold Customer slow Complaints even"))
        .otherwise(lit("quiet supplier notes"))       as "s_comment",
    )
  }

  def partsupp(spark: SparkSession, sf: Double = 0.01, seed: Long = 7): DataFrame = {
    val nPart = n(NPartPerSf, sf); val nSupp = n(NSupplierPerSf, sf)
    spark.range(nPart * 4).select(
      (col("id") / 4 + 1).cast(LongType)              as "ps_partkey",
      (pmod(col("id") * 7919 + (col("id") % 4) * 104729, lit(nSupp)) + 1).cast(LongType) as "ps_suppkey",
      (rand(seed) * 9999 + 1).cast(LongType)          as "ps_availqty",
      round(rand(seed + 1) * 1000 + 1, 2)             as "ps_supplycost",
    ).dropDuplicates("ps_partkey", "ps_suppkey")
  }

  def nation(spark: SparkSession): DataFrame = {
    import spark.implicits._
    NationNames.zipWithIndex.map { case (nm, i) => (i.toLong, nm, (i % 5).toLong) }
      .toDF("n_nationkey", "n_name", "n_regionkey")
  }

  def region(spark: SparkSession): DataFrame = {
    import spark.implicits._
    RegionNames.zipWithIndex.map { case (nm, i) => (i.toLong, nm) }
      .toDF("r_regionkey", "r_name")
  }

  /** All eight tables at one scale factor. */
  def tables(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "lineitem" -> lineitem(spark, sf), "orders" -> orders(spark, sf),
    "customer" -> customer(spark, sf), "part" -> part(spark, sf),
    "supplier" -> supplier(spark, sf), "partsupp" -> partsupp(spark, sf),
    "nation" -> nation(spark), "region" -> region(spark))

  /** Catalog entries (schemas + keys) for the eight tables — the §III-A
    * "database catalog" contextual information. */
  val catalog: Catalog = Catalog.empty
    .withTable("lineitem", Vector("l_orderkey", "l_partkey", "l_suppkey", "l_linenumber",
      "l_quantity", "l_extendedprice", "l_discount", "l_tax", "l_returnflag", "l_linestatus",
      "l_shipdate", "l_commitdate", "l_receiptdate", "l_shipinstruct", "l_shipmode"))
    .withTable("orders", Vector("o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice",
      "o_orderdate", "o_orderpriority", "o_clerk", "o_shippriority", "o_comment"),
      unique = Set("o_orderkey"))
    .withTable("customer", Vector("c_custkey", "c_name", "c_address", "c_nationkey",
      "c_phone", "c_acctbal", "c_mktsegment", "c_comment"), unique = Set("c_custkey"))
    .withTable("part", Vector("p_partkey", "p_name", "p_mfgr", "p_brand", "p_type",
      "p_size", "p_container", "p_retailprice"), unique = Set("p_partkey"))
    .withTable("supplier", Vector("s_suppkey", "s_name", "s_address", "s_nationkey",
      "s_phone", "s_acctbal", "s_comment"), unique = Set("s_suppkey"))
    .withTable("partsupp", Vector("ps_partkey", "ps_suppkey", "ps_availqty", "ps_supplycost"))
    .withTable("nation", Vector("n_nationkey", "n_name", "n_regionkey"), unique = Set("n_nationkey"))
    .withTable("region", Vector("r_regionkey", "r_name"), unique = Set("r_regionkey"))
}

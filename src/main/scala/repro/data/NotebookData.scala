package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Catalog

/** Synthetic datasets for the data-science workloads of §V-A: the Weld
  * Crime Index and Birth Analysis notebooks, the PyFroid Kaggle notebooks
  * (N3 airline, N9), the hybrid matrix-calculation experiments, and the
  * covariance micro-benchmark matrices.
  *
  * The original notebook datasets are not redistributable; these generators
  * (substitutions documented in DESIGN.md) match their schemas and
  * selectivity characteristics. All are deterministic in (sf, seed).
  */
object NotebookData {

  // --------------------------------------------------------- Crime Index
  /** City crime statistics (Weld crime_index): 1M rows at sf=1. */
  def crimes(spark: SparkSession, sf: Double, seed: Long = 20): DataFrame =
    spark.range(math.max(1L, (1_000_000L * sf).toLong)).select(
      col("id")                                      as "city_id",
      round(rand(seed) * 1_000_000 + 1000, 3)        as "total_population",
      round(rand(seed + 1) * 500_000 + 500, 3)       as "adult_population",
      round(rand(seed + 2) * 5000, 3)                as "num_robberies",
    )

  /** The crime-index weight vector, stored as a 3×1 dense matrix. */
  def crimeWeights(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq((0L, 2.0e-6), (1L, 1.0e-6), (2L, -3.0e-4)).toDF("id", "c0")
  }

  // ------------------------------------------------------ Birth Analysis
  /** US-names-style births table: (year, name, sex, births). */
  def births(spark: SparkSession, sf: Double, seed: Long = 30): DataFrame =
    spark.range(math.max(1L, (1_000_000L * sf).toLong)).select(
      (lit(1880L) + pmod(col("id"), lit(131L)))          as "year",
      concat(lit("name"), (rand(seed) * 500).cast("int").cast("string")) as "name",
      element_at(array(lit("F"), lit("M")), (rand(seed + 1) * 2 + 1).cast("int")) as "sex",
      (rand(seed + 2) * 1000 + 1).cast(LongType).cast(DoubleType) as "births",
    )

  // ------------------------------------------------- N3 (airline, Kaggle)
  /** Airline on-time performance-style table (~700MB at sf=1 in the paper;
    * 2M rows/sf here). */
  def flights(spark: SparkSession, sf: Double, seed: Long = 40): DataFrame = {
    val airports = (1 to 50).map(i => s"AP$i")
    val carriers = (1 to 12).map(i => s"CR$i")
    spark.range(math.max(1L, (2_000_000L * sf).toLong)).select(
      element_at(array(airports.map(lit): _*), (rand(seed) * 50 + 1).cast("int"))     as "origin",
      element_at(array(airports.map(lit): _*), (rand(seed + 1) * 50 + 1).cast("int")) as "dest",
      element_at(array(carriers.map(lit): _*), (rand(seed + 2) * 12 + 1).cast("int")) as "carrier",
      (rand(seed + 3) * 12 + 1).cast(LongType)           as "month",
      round(rand(seed + 4) * 120 - 20, 1)                as "dep_delay",
      round(rand(seed + 5) * 140 - 30, 1)                as "arr_delay",
      round(rand(seed + 6) * 3000 + 100, 1)              as "distance",
      (rand(seed + 7) * 100).cast(LongType) % 50         as "cancelled_bucket",
    ).withColumn("cancelled", when(col("cancelled_bucket") === 0, 1L).otherwise(0L))
      .drop("cancelled_bucket")
  }

  // ------------------------------------------------------- N9 (salaries)
  /** Developer-survey-style salary table. */
  def salaries(spark: SparkSession, sf: Double, seed: Long = 50): DataFrame = {
    val countries = (1 to 30).map(i => s"C$i")
    spark.range(math.max(1L, (1_000_000L * sf).toLong)).select(
      element_at(array(countries.map(lit): _*), (rand(seed) * 30 + 1).cast("int")) as "country",
      (rand(seed + 1) * 45 + 18).cast(LongType)          as "age",
      round(rand(seed + 2) * 180_000 + 8_000, 2)         as "salary",
      (rand(seed + 3) * 40 + 1).cast(LongType)           as "years_exp",
    )
  }

  // ----------------------------------------- Hybrid matrix calculations
  /** Left/right fact tables for the hybrid join→einsum experiments:
    * a shared key plus 4 numeric columns each (8-column joined matrix). */
  def hybridA(spark: SparkSession, sf: Double, seed: Long = 60): DataFrame =
    spark.range(1, math.max(1L, (1_000_000L * sf).toLong) + 1).select(
      col("id") as "key",
      round(rand(seed) * 100, 4) as "x1", round(rand(seed + 1) * 100, 4) as "x2",
      round(rand(seed + 2) * 100, 4) as "x3", round(rand(seed + 3) * 100, 4) as "x4")

  def hybridB(spark: SparkSession, sf: Double, seed: Long = 70): DataFrame =
    spark.range(1, math.max(1L, (1_000_000L * sf).toLong) + 1).select(
      col("id") as "key",
      round(rand(seed) * 100, 4) as "y1", round(rand(seed + 1) * 100, 4) as "y2",
      round(rand(seed + 2) * 100, 4) as "y3", round(rand(seed + 3) * 100, 4) as "y4")

  /** The 8×1 weight vector for the hybrid matrix–vector experiment. */
  def hybridWeights(spark: SparkSession): DataFrame = {
    import spark.implicits._
    (0 until 8).map(i => (i.toLong, (i + 1) * 0.1)).toDF("id", "c0")
  }

  // --------------------------------------------- Covariance micro-bench
  /** Dense matrix `(id, c0..c{cols-1})` with the given density (fraction of
    * non-zero cells; the paper's "sparsity" axis). */
  def matrixDense(spark: SparkSession, rows: Long, cols: Int, density: Double,
                  seed: Long = 80): DataFrame = {
    val cells = (0 until cols).map(j =>
      when(rand(seed + j) < density, round(rand(seed + 1000 + j) * 10, 4)).otherwise(0.0).as(s"c$j"))
    spark.range(rows).select(col("id") +: cells: _*)
  }

  /** The same matrix in COO `(i, j, v)` layout (zero cells dropped). */
  def matrixCoo(spark: SparkSession, rows: Long, cols: Int, density: Double,
                seed: Long = 80): DataFrame = {
    val d = matrixDense(spark, rows, cols, density, seed)
    val arr = array((0 until cols).map(j => col(s"c$j")): _*)
    d.select(col("id") as "i", posexplode(arr).as(Seq("j", "v")))
      .where(col("v") =!= 0.0)
      .select(col("i"), col("j").cast(LongType) as "j", col("v"))
  }

  /** Catalog for the notebook/hybrid workloads. */
  val catalog: Catalog = Catalog.empty
    .withTable("crimes", Vector("city_id", "total_population", "adult_population", "num_robberies"),
      unique = Set("city_id"))
    .withMatrix("crime_weights", 1)
    .withTable("births", Vector("year", "name", "sex", "births"))
    .withTable("flights", Vector("origin", "dest", "carrier", "month", "dep_delay",
      "arr_delay", "distance", "cancelled"))
    .withTable("salaries", Vector("country", "age", "salary", "years_exp"))
    .withTable("hybrid_a", Vector("key", "x1", "x2", "x3", "x4"), unique = Set("key"))
    .withTable("hybrid_b", Vector("key", "y1", "y2", "y3", "y4"), unique = Set("key"))
    .withMatrix("hybrid_weights", 1)

  /** All notebook/hybrid base tables at one scale factor. */
  def tables(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "crimes" -> crimes(spark, sf), "crime_weights" -> crimeWeights(spark),
    "births" -> births(spark, sf), "flights" -> flights(spark, sf),
    "salaries" -> salaries(spark, sf),
    "hybrid_a" -> hybridA(spark, sf), "hybrid_b" -> hybridB(spark, sf),
    "hybrid_weights" -> hybridWeights(spark))
}

package repro

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)    as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 9) * 2557).cast("int"))    as "l_shipdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
    )
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }

  // ======================================================================
  // TPC-H-lite extension: the full 8-table schema (still synthetic and
  // deterministic in (sf, seed)), with the columns the 22 queries touch.
  // ======================================================================

  private val NSupplierPerSf = 10_000L
  private def vocab(c: Column, words: String*): Column =
    element_at(array(words.map(lit): _*), (c * words.size + 1).cast(IntegerType))

  /** lineitem with the extra columns Q4/Q7/Q9/Q12/Q14/Q19/Q21 need. */
  def lineitemFull(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    val nSupp = n(NSupplierPerSf, sf)
    val base = lineitem(spark, sf, seed)
    base.select(
      base.col("*"),
      (rand(seed + 10) * nSupp + 1).cast(LongType) as "l_suppkey",
      date_add(col("l_shipdate"), (rand(seed + 11) * 60 - 30).cast(IntegerType)) as "l_commitdate",
      date_add(col("l_shipdate"), (rand(seed + 12) * 30 + 1).cast(IntegerType)) as "l_receiptdate",
      vocab(rand(seed + 13), "DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN") as "l_shipinstruct",
      vocab(rand(seed + 14), "AIR", "AIR REG", "MAIL", "SHIP", "TRUCK", "RAIL", "FOB") as "l_shipmode",
    )
  }

  /** orders with priority / shippriority / comment for Q3/Q4/Q13/Q21. */
  def ordersFull(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    val base = orders(spark, sf, seed)
    base.select(
      base.col("*"),
      vocab(rand(seed + 10), "1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW") as "o_orderpriority",
      lit(0).cast(IntegerType) as "o_shippriority",
      vocab(rand(seed + 11),
        "quick brown packages wake", "special requests sleep furiously", "regular deposits haggle",
        "pending special packages requests", "final accounts nag", "express ideas cajole",
        "bold special asymptotes requests integrate", "even theodolites detect") as "o_comment",
    )
  }

  /** customer with a nation-coded phone for Q22. */
  def customerFull(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    val base = customer(spark, sf, seed)
    base.select(
      base.col("*"),
      concat(lpad((col("c_nationkey") + 10).cast(StringType), 2, "0"), lit("-"),
        lpad((rand(seed + 10) * 10000000).cast(LongType).cast(StringType), 7, "0")) as "c_phone",
    )
  }

  /** part with name / mfgr / brand / container for Q2/Q9/Q14/Q16/Q17/Q19. */
  def partFull(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    val base = part(spark, sf, seed)
    base.select(
      base.col("*"),
      concat(
        vocab(rand(seed + 10), "green", "blanched", "hot", "misty", "powder", "almond"), lit(" "),
        vocab(rand(seed + 11), "tomato", "salmon", "olive", "khaki", "linen", "rose")) as "p_name",
      concat(lit("Manufacturer#"), (rand(seed + 12) * 5 + 1).cast(IntegerType).cast(StringType)) as "p_mfgr",
      concat(lit("Brand#"), (rand(seed + 13) * 5 + 1).cast(IntegerType).cast(StringType),
        (rand(seed + 14) * 5 + 1).cast(IntegerType).cast(StringType)) as "p_brand",
      concat(
        vocab(rand(seed + 15), "SM", "MED", "LG", "JUMBO", "WRAP"), lit(" "),
        vocab(rand(seed + 16), "CASE", "BOX", "BAG", "JAR", "PKG", "PACK", "CAN", "DRUM")) as "p_container",
    )
  }

  def supplier(spark: SparkSession, sf: Double = 0.01, seed: Long = 6): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NSupplierPerSf, sf) + 1).toDF("s_suppkey").select(
      $"s_suppkey",
      concat(lit("Supplier#"), $"s_suppkey".cast(StringType)) as "s_name",
      (rand(seed) * 25).cast(IntegerType) as "s_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2) as "s_acctbal",
      vocab(rand(seed + 2),
        "blithely final Customer Complaints", "carefully regular accounts",
        "quick deposits wake", "slyly ironic requests", "furious Customer Complaints sleep",
        "express packages haggle") as "s_comment",
    )
  }

  /** partsupp: 4 supplier rows per part, deterministic supplier spread. */
  def partsupp(spark: SparkSession, sf: Double = 0.01, seed: Long = 7): DataFrame = {
    import spark.implicits._
    val nP = n(NPartPerSf, sf); val nS = n(NSupplierPerSf, sf)
    spark.range(nP * 4).select(
      (col("id") / 4 + 1).cast(LongType) as "ps_partkey",
      (pmod(col("id") * 7 + (col("id") % 4) * (nS / 4), lit(nS)) + 1).cast(LongType) as "ps_suppkey",
      (rand(seed) * 9999 + 1).cast(IntegerType) as "ps_availqty",
      round(rand(seed + 1) * 1000 + 1, 2) as "ps_supplycost",
    )
  }

  private val NationNames = Vector(
    "ALGERIA", "ARGENTINA", "BRAZIL", "CANADA", "EGYPT", "ETHIOPIA", "FRANCE", "GERMANY",
    "INDIA", "INDONESIA", "IRAN", "IRAQ", "JAPAN", "JORDAN", "KENYA", "MOROCCO", "MOZAMBIQUE",
    "PERU", "CHINA", "ROMANIA", "SAUDI ARABIA", "VIETNAM", "RUSSIA", "UNITED KINGDOM", "UNITED STATES")
  private val NationRegion = Vector(0, 1, 1, 1, 4, 0, 3, 3, 2, 2, 4, 4, 2, 4, 0, 0, 0, 1, 2, 3, 4, 2, 3, 3, 1)
  private val RegionNames = Vector("AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST")

  def nation(spark: SparkSession): DataFrame = {
    import spark.implicits._
    NationNames.indices.map(i => (i, NationNames(i), NationRegion(i))).toDF(
      "n_nationkey", "n_name", "n_regionkey")
  }

  def region(spark: SparkSession): DataFrame = {
    import spark.implicits._
    RegionNames.indices.map(i => (i, RegionNames(i))).toDF("r_regionkey", "r_name")
  }

  // ======================================================================
  // Workload generators beyond TPC-H
  // ======================================================================

  /** TPCx-AI UC10 analog: a huge financial-transaction table whose
    * customer key is zipf-hot — the extreme size-imbalance + key-skew
    * join the paper uses to show dynamic tiling (§VI-B).
    */
  def transactions(spark: SparkSession, sf: Double = 0.01, nCustomers: Long = 2000,
                   alpha: Double = 1.05, seed: Long = 8): DataFrame = {
    val rows = n(6_000_000L, sf)
    val norm = (1L to math.min(nCustomers, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nCustomers), greatest(lit(1L),
        pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType))) as "t_custkey",
      round(rand(seed + 1) * 5000 + 1, 2) as "t_amount",
      (rand(seed + 2) * 86400 * 365).cast(LongType) as "t_ts",
      vocab(rand(seed + 3), "web", "pos", "atm", "wire") as "t_channel",
      (rand(seed + 4) < 0.02).cast(IntegerType) as "t_flagged",
    )
  }

  /** Tiny customer side of the UC10 join (the paper's 3.2 MB file). */
  def uc10Customers(spark: SparkSession, nCustomers: Long = 2000, seed: Long = 9): DataFrame = {
    import spark.implicits._
    spark.range(1, nCustomers + 1).toDF("c_custkey").select(
      $"c_custkey",
      round(rand(seed) * 50000 + 500, 2) as "c_limit",
      (rand(seed + 1) * 100).cast(IntegerType) as "c_score",
    )
  }

  /** Census-like wide table: categorical strings with nulls + numerics —
    * exercises fillna, many withColumns, groupby means (Fig 8a census).
    */
  def censusLike(spark: SparkSession, sf: Double = 0.01, seed: Long = 10): DataFrame = {
    val rows = n(2_000_000L, sf)
    def maybeNull(c: Column, p: Double, s: Long): Column =
      when(rand(s) < p, lit(null)).otherwise(c)
    spark.range(rows).select(
      (rand(seed) * 80 + 17).cast(IntegerType) as "age",
      maybeNull(vocab(rand(seed + 1), "Private", "Self-emp", "Federal-gov", "Local-gov", "State-gov"),
        0.05, seed + 2) as "workclass",
      vocab(rand(seed + 3), "HS-grad", "Some-college", "Bachelors", "Masters", "Doctorate") as "education",
      (rand(seed + 4) * 16 + 1).cast(IntegerType) as "education_num",
      vocab(rand(seed + 5), "Married", "Never-married", "Divorced", "Widowed") as "marital_status",
      maybeNull(vocab(rand(seed + 6), "Tech-support", "Craft-repair", "Sales", "Exec-managerial",
        "Prof-specialty", "Handlers-cleaners"), 0.05, seed + 7) as "occupation",
      vocab(rand(seed + 8), "Male", "Female") as "sex",
      round(rand(seed + 9) * 5000, 2) as "capital_gain",
      round(rand(seed + 10) * 2000, 2) as "capital_loss",
      (rand(seed + 11) * 60 + 20).cast(IntegerType) as "hours_per_week",
      (rand(seed + 12) < 0.24).cast(IntegerType) as "income_gt_50k",
    )
  }

  /** PLAsTiCC-like astronomical time series: long grouped observations —
    * exercises heavy groupby feature extraction (Fig 8a plasticc).
    */
  def plasticcLike(spark: SparkSession, sf: Double = 0.01, seed: Long = 11): DataFrame = {
    val rows = n(4_000_000L, sf)
    val nObjects = math.max(10L, n(20_000L, sf))
    spark.range(rows).select(
      (rand(seed) * nObjects + 1).cast(LongType) as "object_id",
      (rand(seed + 1) * 6).cast(IntegerType) as "passband",
      round(rand(seed + 2) * 1000 + 59580, 4) as "mjd",
      round((rand(seed + 3) - 0.5) * 2000, 4) as "flux",
      round(rand(seed + 4) * 50 + 1, 4) as "flux_err",
      (rand(seed + 5) < 0.3).cast(IntegerType) as "detected",
    )
  }
}

package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.SynthData
import repro.core.AggSpec._
import repro.core.{Engine, XFrame}

/** TPCx-AI UC10 analog (paper §VI-B): fraud scoring over a huge, zipf-
  * skewed transaction log merged with a tiny customer table.
  *
  * This is the workload where static partitioning degenerates: a hash
  * shuffle of the fact table puts the hot customers' transactions into
  * one reducer, while Xorbits' dynamic tiling detects the tiny side and
  * broadcast-merges it against every fact chunk (29×/37× in the paper).
  */
object Uc10 {

  final case class Inputs(transactions: DataFrame, customers: DataFrame)

  def inputs(spark: SparkSession, sf: Double, nCustomers: Long = 2000): Inputs =
    Inputs(
      SynthData.transactions(spark, sf, nCustomers),
      SynthData.uc10Customers(spark, nCustomers))

  /** The pipeline: filter valid rows, merge customers, per-customer
    * feature aggregation, risk filter.
    */
  def pipeline(engine: Engine, in: Inputs): XFrame = {
    val tx = XFrame.source(engine, "uc10_tx", in.transactions)
    val cust = XFrame.source(engine, "uc10_cust", in.customers)
    tx.filter(col("t_amount") > 0)
      .withColumn("is_web", when(col("t_channel") === "web", 1.0).otherwise(0.0))
      .rename("t_custkey" -> "c_custkey")
      .merge(cust, Seq("c_custkey"))
      .withColumn("over_limit", when(col("t_amount") > col("c_limit"), 1.0).otherwise(0.0))
      .groupby("c_custkey")
      .agg(
        SumAgg("t_amount", "amount_sum"), CountAgg("tx_count"),
        MeanAgg("t_amount", "amount_mean"), SumAgg("over_limit", "over_limit_cnt"),
        SumAgg("is_web", "web_cnt"), SumAgg("t_flagged", "flagged_cnt"))
      .filter(col("flagged_cnt") > 0 || col("over_limit_cnt") > 2)
  }

  /** DuckDB reference SQL over tables `tx` and `cust` (raw names). */
  val referenceSql: String = """
    SELECT c_custkey, amount_sum, tx_count, amount_mean, over_limit_cnt, web_cnt, flagged_cnt
    FROM (
      SELECT t.t_custkey AS c_custkey,
             SUM(CAST(t_amount AS DOUBLE)) AS amount_sum,
             COUNT(*) AS tx_count,
             AVG(CAST(t_amount AS DOUBLE)) AS amount_mean,
             SUM(CASE WHEN CAST(t_amount AS DOUBLE) > CAST(c_limit AS DOUBLE) THEN 1.0 ELSE 0.0 END) AS over_limit_cnt,
             SUM(CASE WHEN t_channel = 'web' THEN 1.0 ELSE 0.0 END) AS web_cnt,
             SUM(CAST(t_flagged AS BIGINT)) AS flagged_cnt
      FROM tx t JOIN cust c ON CAST(t.t_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
      WHERE CAST(t_amount AS DOUBLE) > 0
      GROUP BY t.t_custkey)
    WHERE flagged_cnt > 0 OR over_limit_cnt > 2"""
}

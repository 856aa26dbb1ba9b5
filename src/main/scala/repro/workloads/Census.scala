package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.SynthData
import repro.core.AggSpec._
import repro.core.{Engine, XFrame}

/** Census-like preprocessing + feature-engineering pipeline (the paper's
  * Kaggle `census` workload, Fig 8a): fillna over categoricals, a long
  * chain of feature columns (where operator-level fusion pays off),
  * filtering, and per-group statistics.
  */
object Census {

  def input(spark: SparkSession, sf: Double): DataFrame = SynthData.censusLike(spark, sf)

  def pipeline(engine: Engine, df: DataFrame): XFrame = {
    XFrame.source(engine, "census", df)
      .fillna("Unknown", "workclass", "occupation")
      .withColumn("net_capital", col("capital_gain") - col("capital_loss"))
      .withColumn("is_senior", when(col("age") >= 60, 1.0).otherwise(0.0))
      .withColumn("hours_band", (col("hours_per_week") / 10).cast("int"))
      .withColumn("edu_x_hours", col("education_num") * col("hours_per_week"))
      .withColumn("gain_rate", col("capital_gain") / (col("hours_per_week") + 1))
      .withColumn("loss_rate", col("capital_loss") / (col("hours_per_week") + 1))
      .withColumn("age_sq", col("age") * col("age"))
      .withColumn("is_married", when(col("marital_status") === "Married", 1.0).otherwise(0.0))
      .filter(col("age") >= 18 && col("hours_per_week") > 0)
      .groupby("education", "sex")
      .agg(
        MeanAgg("net_capital", "net_capital_mean"), MeanAgg("edu_x_hours", "edu_hours_mean"),
        MeanAgg("income_gt_50k", "income_rate"), SumAgg("is_senior", "seniors"),
        SumAgg("is_married", "married"), CountAgg("n"), VarAgg("age", "age_var"))
  }

  /** DuckDB reference over raw table `census`. */
  val referenceSql: String = """
    SELECT education, sex,
           AVG(CAST(capital_gain AS DOUBLE) - CAST(capital_loss AS DOUBLE)) AS net_capital_mean,
           AVG(CAST(education_num AS DOUBLE) * CAST(hours_per_week AS DOUBLE)) AS edu_hours_mean,
           AVG(CAST(income_gt_50k AS DOUBLE)) AS income_rate,
           SUM(CASE WHEN CAST(age AS BIGINT) >= 60 THEN 1.0 ELSE 0.0 END) AS seniors,
           SUM(CASE WHEN marital_status = 'Married' THEN 1.0 ELSE 0.0 END) AS married,
           COUNT(*) AS n,
           VAR_SAMP(CAST(age AS DOUBLE)) AS age_var
    FROM census
    WHERE CAST(age AS BIGINT) >= 18 AND CAST(hours_per_week AS BIGINT) > 0
    GROUP BY education, sex"""
}

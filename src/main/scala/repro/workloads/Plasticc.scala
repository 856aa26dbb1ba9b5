package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.SynthData
import repro.core.AggSpec._
import repro.core.{Engine, XFrame}

/** PLAsTiCC-like light-curve feature extraction (the paper's Kaggle
  * `plasticc` workload, Fig 8a): heavy groupby statistics over a long
  * astronomical time series, per (object, passband).
  */
object Plasticc {

  def input(spark: SparkSession, sf: Double): DataFrame = SynthData.plasticcLike(spark, sf)

  def pipeline(engine: Engine, df: DataFrame): XFrame = {
    XFrame.source(engine, "plasticc", df)
      .filter(col("flux_err") > 0)
      .withColumn("snr", col("flux") / col("flux_err"))
      .withColumn("abs_flux", abs(col("flux")))
      .groupby("object_id", "passband")
      .agg(
        MeanAgg("flux", "flux_mean"), VarAgg("flux", "flux_var"),
        MinAgg("flux", "flux_min"), MaxAgg("flux", "flux_max"),
        MeanAgg("snr", "snr_mean"), SumAgg("detected", "n_detected"),
        MaxAgg("abs_flux", "flux_amp"), CountAgg("n_obs"))
  }

  /** DuckDB reference over raw table `plasticc`. */
  val referenceSql: String = """
    SELECT CAST(object_id AS BIGINT) AS object_id, CAST(passband AS BIGINT) AS passband,
           AVG(CAST(flux AS DOUBLE)) AS flux_mean,
           VAR_SAMP(CAST(flux AS DOUBLE)) AS flux_var,
           MIN(CAST(flux AS DOUBLE)) AS flux_min,
           MAX(CAST(flux AS DOUBLE)) AS flux_max,
           AVG(CAST(flux AS DOUBLE) / CAST(flux_err AS DOUBLE)) AS snr_mean,
           SUM(CAST(detected AS BIGINT)) AS n_detected,
           MAX(ABS(CAST(flux AS DOUBLE))) AS flux_amp,
           COUNT(*) AS n_obs
    FROM plasticc
    WHERE CAST(flux_err AS DOUBLE) > 0
    GROUP BY CAST(object_id AS BIGINT), CAST(passband AS BIGINT)"""
}

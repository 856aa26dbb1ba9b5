package jobs

import org.apache.spark.sql.SparkSession

import repro.baseline.Engines
import repro.workloads.Uc10

/** spark-submit entrypoint for the TPCx-AI UC10 skew-join demo (Fig 8a):
  * compares the dynamic-tiling engine against the static baseline on the
  * size-imbalanced, zipf-skewed merge.
  *
  * Usage: spark-submit --class jobs.SkewJoinJob repro.jar [sf]
  */
object SkewJoinJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.03)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("uc10-skew").getOrCreate()
    val in = Uc10.inputs(spark, sf)
    for (mode <- Seq("dynamic", "static")) {
      val e = if (mode == "dynamic") Engines.xorbits(spark, 2L << 20)
              else Engines.static(spark, 2L << 20)
      val t0 = System.nanoTime()
      val n = Uc10.pipeline(e, in).toDF().count()
      println(f"$mode%-8s rows=$n%8d wall=${(System.nanoTime() - t0) / 1e9}%7.2f s ${e.stats}")
      e.reset()
    }
    spark.stop()
  }
}

package jobs

import org.apache.spark.sql.SparkSession

import repro.tensor.{TSQR, XTensor}

/** spark-submit entrypoint for the array benchmark (Fig 8c): tall-and-
  * skinny QR with auto rechunk vs manual chunking + stage materialization.
  *
  * Usage: spark-submit --class jobs.QrJob repro.jar [rows] [cols]
  */
object QrJob {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toLong).getOrElse(200000L)
    val cols = args.lift(1).map(_.toInt).getOrElse(32)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tsqr").getOrCreate()
    val auto = XTensor.randn(spark, rows, cols, chunkLimit = 4L << 20)
    var t0 = System.nanoTime()
    val r1 = TSQR.qrDecompose(auto)
    r1.q.rdd.count()
    println(f"auto-rechunk QR: chunks=${auto.numChunks} wall=${(System.nanoTime() - t0) / 1e9}%7.2f s")
    val manual = XTensor.randnManual(spark, rows, cols, chunkRows = math.max(cols, 2000))
    t0 = System.nanoTime()
    val r2 = TSQR.qrDecompose(manual, materializeStages = true)
    r2.q.rdd.count()
    println(f"manual+materialized QR: chunks=${manual.numChunks} wall=${(System.nanoTime() - t0) / 1e9}%7.2f s")
    spark.stop()
  }
}

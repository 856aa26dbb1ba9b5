package jobs

import org.apache.spark.sql.SparkSession

import repro.baseline.Engines
import repro.tpch.{TpchCtx, TpchData, TpchQueries}

/** spark-submit entrypoint for running TPC-H-lite queries through the
  * dynamic-tiling engine.
  *
  * Usage: spark-submit --class jobs.TpchJob repro.jar [queryId|all] [sf] [dynamic|static]
  */
object TpchJob {
  def main(args: Array[String]): Unit = {
    val which = args.headOption.getOrElse("all")
    val sf = args.lift(1).map(_.toDouble).getOrElse(0.01)
    val mode = args.lift(2).getOrElse("dynamic")
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tpch-lite").getOrCreate()
    val engine =
      if (mode == "static") Engines.static(spark) else Engines.xorbits(spark)
    val ctx = TpchCtx(engine, TpchData.tables(spark, sf))
    val ids = if (which == "all") (1 to 22) else Seq(which.toInt)
    ids.foreach { id =>
      val q = TpchQueries.byId(id)
      val t0 = System.nanoTime()
      val n = q.run(ctx).toDF().count()
      println(f"Q$id%-3d ${q.name}%-38s rows=$n%8d  ${(System.nanoTime() - t0) / 1e9}%7.2f s")
    }
    println(engine.stats.toString)
    engine.reset()
    spark.stop()
  }
}

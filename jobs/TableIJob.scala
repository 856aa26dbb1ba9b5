package jobs

import repro.sim.FrameworkModel

/** spark-submit entrypoint for paper Tables I and II: prints the
  * framework-model outcomes (no cluster needed — the models are
  * analytic; see DESIGN.md §3).
  *
  * Usage: spark-submit --class jobs.TableIJob repro.jar
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val tI = FrameworkModel.tableI()
    println("Table I — number of failed TPC-H queries")
    println(f"${"SF"}%8s ${"pandas"}%8s ${"PySpark"}%8s ${"Dask"}%8s ${"Modin"}%8s ${"Xorbits"}%8s")
    Seq(10.0, 100.0, 1000.0).foreach { sf =>
      val row = Seq("pandas", "PySpark", "Dask", "Modin", "Xorbits")
        .map(fw => f"${tI((fw, sf))}%8d").mkString(" ")
      println(f"${sf.toInt}%8d $row")
    }
    println()
    println("Table II — reasons frameworks fail on TPC-H SF1000")
    val tII = FrameworkModel.tableII()
    Seq("API Compatibility", "Hang", "OOM or Killed", "Total").foreach { r =>
      val row = Seq("PySpark", "Dask", "Modin").map(fw => f"${tII((fw, r))}%8d").mkString(" ")
      println(f"$r%-20s $row")
    }
  }
}
